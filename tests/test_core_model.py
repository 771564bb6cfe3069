"""Unit tests for the AdaMEL numpy model (shapes, invariants)."""
import numpy as np
import pytest

from repro.core.model import (
    ModelConfig,
    attention,
    fit_standardizer,
    forward,
    init_params,
    n_params,
    predict,
    standardize,
)


@pytest.fixture(scope="module")
def cfg():
    return ModelConfig(n_features=6, dim=8, h=5, hp=7, hh=9, seed=0)


@pytest.fixture(scope="module")
def params(cfg):
    return init_params(cfg)


@pytest.fixture(scope="module")
def H_in(cfg):
    return np.random.default_rng(1).standard_normal((4, cfg.n_features, cfg.dim))


def test_param_shapes(cfg, params):
    assert params["V"].shape == (6, 5, 8)
    assert params["b"].shape == (6, 5)
    assert params["W"].shape == (7, 5)
    assert params["a"].shape == (7,)
    assert params["W1"].shape == (9, 30)
    assert params["b1"].shape == (9,)
    assert params["w2"].shape == (9,)
    assert params["b2"].shape == (1,)


def test_init_deterministic(cfg):
    p1, p2 = init_params(cfg), init_params(cfg)
    for k in p1:
        assert np.allclose(p1[k], p2[k])


def test_init_seed_changes(cfg):
    p2 = init_params(ModelConfig(**{**cfg.__dict__, "seed": 1}))
    assert not np.allclose(init_params(cfg)["V"], p2["V"])


def test_n_params_formula(cfg, params):
    expected = 6 * 5 * 8 + 6 * 5 + 7 * 5 + 7 + 9 * 30 + 9 + 9 + 1
    assert n_params(params) == expected


def test_n_params_excludes_standardizer(cfg, params, H_in):
    p = {k: v.copy() for k, v in params.items()}
    before = n_params(p)
    fit_standardizer(p, H_in)
    assert n_params(p) == before


def test_forward_shapes(params, H_in):
    c = forward(params, H_in)
    assert c["x"].shape == (4, 6, 5)
    assert c["g"].shape == (4, 6)
    assert c["yhat"].shape == (4,)


def test_attention_rows_sum_to_one(params, H_in):
    g = forward(params, H_in)["g"]
    assert np.allclose(g.sum(axis=1), 1.0)
    assert (g > 0).all()


def test_yhat_in_unit_interval(params, H_in):
    y = forward(params, H_in)["yhat"]
    assert ((y > 0) & (y < 1)).all()


def test_forward_deterministic(params, H_in):
    assert np.allclose(forward(params, H_in)["yhat"], forward(params, H_in)["yhat"])


def test_forward_empty_batch(params, cfg):
    c = forward(params, np.zeros((0, cfg.n_features, cfg.dim)))
    assert c["yhat"].shape == (0,)


def test_softmax_shift_invariance(params, H_in):
    """Softmax uses the max-shift trick: huge inputs don't overflow."""
    big = H_in * 1e3
    g = forward(params, big)["g"]
    assert np.isfinite(g).all()
    assert np.allclose(g.sum(axis=1), 1.0)


def test_standardize_noop_without_stats(params, H_in):
    assert np.allclose(standardize(params, H_in), H_in)


def test_standardize_zero_mean_unit_var(params, H_in):
    p = {k: v.copy() for k, v in params.items()}
    fit_standardizer(p, H_in)
    Z = standardize(p, H_in).reshape(4, -1)
    assert np.allclose(Z.mean(axis=0), 0.0, atol=1e-9)
    assert np.allclose(Z.std(axis=0)[Z.std(axis=0) > 1e-6], 1.0, atol=1e-6)


def test_standardize_constant_dims_safe(params, cfg):
    p = {k: v.copy() for k, v in params.items()}
    H = np.ones((5, cfg.n_features, cfg.dim))
    fit_standardizer(p, H)
    assert np.isfinite(standardize(p, H)).all()


def test_predict_and_attention_apply_standardization(params, H_in):
    p = {k: v.copy() for k, v in params.items()}
    fit_standardizer(p, H_in)
    Z = standardize(p, H_in)
    assert np.allclose(predict(p, H_in), forward(p, Z)["yhat"])
    assert np.allclose(attention(p, H_in), forward(p, Z)["g"])


def test_single_feature_attention_is_one():
    cfg1 = ModelConfig(n_features=1, dim=4, h=3, hp=3, hh=3, seed=0)
    p = init_params(cfg1)
    g = forward(p, np.random.default_rng(0).standard_normal((3, 1, 4)))["g"]
    assert np.allclose(g, 1.0)
