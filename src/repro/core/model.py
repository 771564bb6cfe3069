"""AdaMEL model: per-feature affine + shared soft attention + MLP.

Numpy implementation of §4.2-4.3 (Eqs. 4-7) with a full analytic
backward pass (verified against finite differences in
``tests/test_core_gradients.py``). Dimensions follow the paper's
notation: F features, D token-embedding dim, H latent feature dim,
H' attention dim (``hp``), ``hh`` MLP hidden dim.

Forward, per pair i:
    x_j  = relu(V_j h_j + b_j)                      (Eq. 4)
    e_j  = aᵀ tanh(W x_j)                           (Eq. 5 numerator)
    g    = softmax(e)          — attention f(x), the knowledge 𝒦
    z    = relu(g_j · x_j), concatenated over j     (Eq. 7 inner)
    ŷ    = sigmoid(w2ᵀ relu(W1 z + b1) + b2)        (Eq. 7, Θ)

The paper's §4.5 says Θ consumes an FH'-dim input while Eq. 7 yields
F·H dims; we follow Eq. 7 (F·H) — the architecture is identical up to
that naming slip.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

PARAM_NAMES = ("V", "b", "W", "a", "W1", "b1", "w2", "b2")


@dataclass
class ModelConfig:
    n_features: int
    dim: int = 32  # token-embedding dim D
    h: int = 16  # latent feature dim H
    hp: int = 32  # attention dim H'
    hh: int = 32  # MLP hidden dim H_hidden
    seed: int = 0


def init_params(cfg: ModelConfig) -> dict[str, np.ndarray]:
    """He/Glorot-style initialization, deterministic in ``cfg.seed``."""
    g = np.random.default_rng(cfg.seed)
    F_, D, H, Hp, Hh = cfg.n_features, cfg.dim, cfg.h, cfg.hp, cfg.hh
    return {
        "V": g.standard_normal((F_, H, D)) * np.sqrt(2.0 / D),
        "b": np.zeros((F_, H)),
        "W": g.standard_normal((Hp, H)) * np.sqrt(2.0 / H),
        "a": g.standard_normal(Hp) * np.sqrt(1.0 / Hp),
        "W1": g.standard_normal((Hh, F_ * H)) * np.sqrt(2.0 / (F_ * H)),
        "b1": np.zeros(Hh),
        "w2": g.standard_normal(Hh) * np.sqrt(2.0 / Hh),
        "b2": np.zeros(1),
    }


def n_params(params: dict[str, np.ndarray]) -> int:
    """Total learnable parameter count (§4.5 empirical estimate).

    Excludes the frozen standardization statistics ``mu``/``sd``.
    """
    return int(sum(params[k].size for k in PARAM_NAMES if k in params))


def standardize(params: dict[str, np.ndarray], H_in: np.ndarray) -> np.ndarray:
    """Apply the training-set feature standardization stored in params.

    The per-feature-dim mean/std of the D_S feature tensor are fitted
    once in ``fit_adamel`` and frozen into the parameter dict — without
    centering, the shared-embedding-space premise of the domain
    adaptation (§4.4.1) does not hold numerically and transfer degrades
    badly (see DESIGN.md §6). No-op if the stats are absent.
    """
    if "mu" not in params:
        return H_in
    shape = H_in.shape
    flat = H_in.reshape(len(H_in), -1)
    return ((flat - params["mu"]) / params["sd"]).reshape(shape)


def fit_standardizer(params: dict[str, np.ndarray], H_src: np.ndarray) -> None:
    """Fit ``mu``/``sd`` on the source-domain tensor and store them."""
    flat = H_src.reshape(len(H_src), -1)
    sd = flat.std(axis=0)
    params["mu"] = flat.mean(axis=0)
    params["sd"] = np.where(sd > 1e-8, sd, 1.0)


def forward(params: dict[str, np.ndarray], H_in: np.ndarray) -> dict[str, np.ndarray]:
    """Batched forward pass. ``H_in``: (B, F, D). Returns the cache.

    Cache keys: ``pre, x, U, T, e, g, zp, z, h1pre, h1, logit, yhat``.
    ``g`` is the attention matrix f(x) ∈ (B, F) — rows sum to 1.
    """
    pre = np.einsum("fhd,bfd->bfh", params["V"], H_in) + params["b"]
    x = np.maximum(pre, 0.0)
    U = np.einsum("ph,bfh->bfp", params["W"], x)
    T = np.tanh(U)
    e = T @ params["a"]  # (B, F)
    e_shift = e - e.max(axis=1, keepdims=True)
    exp_e = np.exp(e_shift)
    g = exp_e / exp_e.sum(axis=1, keepdims=True)
    zp = g[:, :, None] * x
    B, F_, H = x.shape
    z = np.maximum(zp, 0.0).reshape(B, F_ * H)
    h1pre = z @ params["W1"].T + params["b1"]
    h1 = np.maximum(h1pre, 0.0)
    logit = h1 @ params["w2"] + params["b2"][0]
    yhat = 1.0 / (1.0 + np.exp(-logit))
    return {
        "H_in": H_in, "pre": pre, "x": x, "U": U, "T": T, "e": e, "g": g,
        "zp": zp, "z": z, "h1pre": h1pre, "h1": h1, "logit": logit, "yhat": yhat,
    }


def backward(
    params: dict[str, np.ndarray],
    cache: dict[str, np.ndarray],
    dlogit: np.ndarray,
    dg_extra: np.ndarray | None = None,
) -> dict[str, np.ndarray]:
    """Analytic gradients for every parameter tensor.

    ``dlogit`` (B,) is ∂L/∂logit (e.g. (ŷ−y)/B for mean BCE);
    ``dg_extra`` (B, F), if given, is ∂L/∂g injected *before* the
    softmax backward — this is how the KL adaptation loss (Eq. 10)
    reaches the attention parameters.
    """
    H_in, pre, x = cache["H_in"], cache["pre"], cache["x"]
    U, T, g, zp = cache["U"], cache["T"], cache["g"], cache["zp"]
    z, h1pre, h1 = cache["z"], cache["h1pre"], cache["h1"]
    B, F_, H = x.shape

    grads = {}
    grads["w2"] = h1.T @ dlogit
    grads["b2"] = np.array([dlogit.sum()])
    dh1 = np.outer(dlogit, params["w2"]) * (h1pre > 0)
    grads["W1"] = dh1.T @ z
    grads["b1"] = dh1.sum(axis=0)
    dz = (dh1 @ params["W1"]).reshape(B, F_, H)
    dzp = dz * (zp > 0)

    dg = np.einsum("bfh,bfh->bf", dzp, x)
    if dg_extra is not None:
        dg = dg + dg_extra
    dx = dzp * g[:, :, None]

    # softmax backward: de = g ⊙ (dg − ⟨dg, g⟩)
    de = g * (dg - np.einsum("bf,bf->b", dg, g)[:, None])
    dT = de[:, :, None] * params["a"]
    dU = dT * (1.0 - T**2)
    grads["a"] = np.einsum("bf,bfp->p", de, T)
    grads["W"] = np.einsum("bfp,bfh->ph", dU, x)
    dx = dx + np.einsum("bfp,ph->bfh", dU, params["W"])

    dpre = dx * (pre > 0)
    grads["V"] = np.einsum("bfh,bfd->fhd", dpre, H_in)
    grads["b"] = dpre.sum(axis=0)
    return grads


def attention(params: dict[str, np.ndarray], H_in: np.ndarray) -> np.ndarray:
    """f(x) ∈ (B, F) — the transferable knowledge 𝒦 (Eq. 6).

    Applies the stored standardization; pass raw feature tensors.
    """
    return forward(params, standardize(params, H_in))["g"]


def predict(params: dict[str, np.ndarray], H_in: np.ndarray) -> np.ndarray:
    """Matching scores ŷ ∈ (B,). Applies the stored standardization."""
    return forward(params, standardize(params, H_in))["yhat"]
