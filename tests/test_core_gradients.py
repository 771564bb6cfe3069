"""Finite-difference gradient checks for every parameter × every loss.

These are the strongest correctness tests of the model: an analytic
backward pass that matches central finite differences on the full loss
surface (BCE, KL adaptation, weighted support BCE, and their hybrid
mix) is almost certainly implementing Eqs. 4-14 consistently.
"""
import numpy as np
import pytest

from repro.core import losses
from repro.core.model import PARAM_NAMES, ModelConfig, backward, forward, init_params

CFG = ModelConfig(n_features=4, dim=5, h=3, hp=4, hh=6, seed=0)
RNG = np.random.default_rng(42)
H_IN = RNG.standard_normal((7, CFG.n_features, CFG.dim))
Y = RNG.integers(0, 2, 7).astype(float)
FBAR = np.array([0.4, 0.3, 0.2, 0.1])
W_SUP = RNG.random(7) + 0.5


def loss_value(params, kind):
    c = forward(params, H_IN)
    if kind == "base":
        return losses.bce(c["yhat"], Y)[0]
    if kind == "kl_mean":
        return losses.kl_target(c["g"], FBAR)[0]
    if kind == "kl_pair":
        return losses.kl_target(c["g"], FBAR, per_pair=True)[0]
    if kind == "support":
        return losses.weighted_bce(c["yhat"], Y, W_SUP)[0]
    if kind == "hybrid":
        return (
            0.02 * losses.bce(c["yhat"], Y)[0]
            + 0.98 * losses.kl_target(c["g"], FBAR)[0]
            + losses.weighted_bce(c["yhat"], Y, W_SUP)[0]
        )
    raise ValueError(kind)


def analytic_grads(params, kind):
    c = forward(params, H_IN)
    if kind == "base":
        _, dlogit = losses.bce(c["yhat"], Y)
        return backward(params, c, dlogit)
    if kind == "kl_mean":
        _, dg = losses.kl_target(c["g"], FBAR)
        return backward(params, c, np.zeros(len(Y)), dg)
    if kind == "kl_pair":
        _, dg = losses.kl_target(c["g"], FBAR, per_pair=True)
        return backward(params, c, np.zeros(len(Y)), dg)
    if kind == "support":
        _, dlogit = losses.weighted_bce(c["yhat"], Y, W_SUP)
        return backward(params, c, dlogit)
    if kind == "hybrid":
        _, d1 = losses.bce(c["yhat"], Y)
        _, dg = losses.kl_target(c["g"], FBAR)
        _, d3 = losses.weighted_bce(c["yhat"], Y, W_SUP)
        return backward(params, c, 0.02 * d1 + d3, 0.98 * dg)
    raise ValueError(kind)


def numeric_grad(params, kind, name, idx, eps=1e-6):
    p = {k: v.copy() for k, v in params.items()}
    p[name].flat[idx] += eps
    up = loss_value(p, kind)
    p[name].flat[idx] -= 2 * eps
    down = loss_value(p, kind)
    return (up - down) / (2 * eps)


@pytest.mark.parametrize("kind", ["base", "kl_mean", "kl_pair", "support", "hybrid"])
@pytest.mark.parametrize("name", PARAM_NAMES)
def test_gradient_matches_finite_difference(kind, name):
    params = init_params(CFG)
    grads = analytic_grads(params, kind)
    g = grads[name]
    rng = np.random.default_rng(hash((kind, name)) % 2**31)
    # check a sample of entries per tensor (all entries for tiny ones)
    n = params[name].size
    idxs = range(n) if n <= 8 else rng.choice(n, size=8, replace=False)
    for idx in idxs:
        num = numeric_grad(params, kind, name, idx)
        ana = g.flat[idx]
        assert ana == pytest.approx(num, rel=2e-4, abs=2e-6), (
            f"{kind}/{name}[{idx}]: analytic={ana} numeric={num}"
        )


def test_backward_zero_dlogit_zero_theta_grads():
    """KL-only gradients never reach the classifier Θ."""
    params = init_params(CFG)
    c = forward(params, H_IN)
    _, dg = losses.kl_target(c["g"], FBAR)
    grads = backward(params, c, np.zeros(len(Y)), dg)
    for k in ("W1", "b1", "w2", "b2"):
        assert np.allclose(grads[k], 0.0)
    for k in ("W", "a"):
        assert not np.allclose(grads[k], 0.0)
