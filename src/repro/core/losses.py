"""AdaMEL losses: L_base (Eq. 8), L_target (Eq. 10), L_support (Eq. 12).

Each loss exposes (a) a scalar value and (b) the gradient hooks the
model backward pass consumes: ``dlogit`` = ∂L/∂logit and, for the KL
adaptation term, ``dg`` = ∂L/∂g injected before the softmax backward.

Conventions (documented deltas from the paper's formulas):
* Losses are *means* over their batch (the paper sums; a constant
  factor absorbed into the learning rate).
* Eq. 12 as printed is a log-likelihood (Σ w·log ŷ ≤ 0); we minimize
  its negation — the weighted NLL — which is the only reading under
  which "training minimizes L_ssl" is coherent.
* The support weights w_i = d(f(x_i), c±)/d̄± and the target mean
  attention f̄(x') are treated as constants within a step
  (stop-gradient), matching Algorithms 1-3 which recompute them from
  the *current* parameters each epoch before the batch updates.
"""
from __future__ import annotations

import numpy as np

_EPS = 1e-9


def bce(
    yhat: np.ndarray, y: np.ndarray, pos_weight: float = 1.0
) -> tuple[float, np.ndarray]:
    """Mean binary cross-entropy (Eq. 8); returns (loss, dlogit).

    ``pos_weight`` re-weights positive examples — used for the heavily
    imbalanced Monitor corpus (>96 % negative training pairs, App. A.1)
    where an unweighted mean drowns the positive gradient.
    """
    yhat_c = np.clip(yhat, _EPS, 1.0 - _EPS)
    w = np.where(y == 1.0, pos_weight, 1.0)
    loss = float(-np.mean(w * (y * np.log(yhat_c) + (1 - y) * np.log(1 - yhat_c))))
    dlogit = w * (yhat - y) / y.size
    return loss, dlogit


def kl_target(
    g: np.ndarray, fbar: np.ndarray, *, per_pair: bool = False
) -> tuple[float, np.ndarray]:
    """Eq. 10: KL between target mean attention f̄(x') and source attention.

    ``g``: (B, F) source-batch attention; ``fbar``: (F,) mean target
    attention (constant). Returns (loss, ∂L/∂g).

    ``per_pair=True`` is the literal Eq. 10 — Σᵢ KL(f̄' ‖ f(xᵢ)) — whose
    exact minimizer forces every pair's attention to one constant
    vector; at λ=0.98 that collapses attention to input-independence
    and hurts linkage (§5.7-style justification in
    tests/test_core_losses.py and DESIGN.md §6). The default matches
    the *batch-mean* source attention KL(f̄' ‖ f̄_batch(x)) instead,
    preserving the stated intent ("project data from D_T into the same
    space … jointly update feature importance") while keeping per-pair
    conditioning.
    """
    g_c = np.clip(g, _EPS, None)
    fb = np.clip(fbar, _EPS, None)
    if per_pair:
        loss = float(np.mean(np.sum(fb * np.log(fb / g_c), axis=1)))
        dg = -(fb[None, :] / g_c) / g.shape[0]
        return loss, dg
    gbar = np.clip(g_c.mean(axis=0), _EPS, None)
    loss = float(np.sum(fb * np.log(fb / gbar)))
    dg = np.tile(-(fb / gbar) / g.shape[0], (g.shape[0], 1))
    return loss, dg


def class_centroids(
    g_src: np.ndarray, y_src: np.ndarray
) -> dict[str, np.ndarray | float]:
    """Eq. 11: attention-space centroids of D_S positives/negatives and
    the mean intra-class distances d̄± used to normalize Eq. 12."""
    pos, neg = y_src == 1.0, y_src == 0.0
    c_pos = g_src[pos].mean(axis=0) if pos.any() else np.full(g_src.shape[1], 1.0 / g_src.shape[1])
    c_neg = g_src[neg].mean(axis=0) if neg.any() else np.full(g_src.shape[1], 1.0 / g_src.shape[1])
    d_pos = np.linalg.norm(g_src[pos] - c_pos, axis=1).mean() if pos.any() else 1.0
    d_neg = np.linalg.norm(g_src[neg] - c_neg, axis=1).mean() if neg.any() else 1.0
    return {
        "c_pos": c_pos,
        "c_neg": c_neg,
        "dbar_pos": max(float(d_pos), _EPS),
        "dbar_neg": max(float(d_neg), _EPS),
    }


def support_weights(
    g_sup: np.ndarray, y_sup: np.ndarray, cents: dict
) -> np.ndarray:
    """Per-pair weight d(f(x_i), c±)/d̄± — larger for support pairs whose
    attention deviates from the seen-source centroid (unseen-source
    pairs matter more, §4.4.2)."""
    w = np.empty(len(y_sup))
    pos = y_sup == 1.0
    w[pos] = np.linalg.norm(g_sup[pos] - cents["c_pos"], axis=1) / cents["dbar_pos"]
    w[~pos] = np.linalg.norm(g_sup[~pos] - cents["c_neg"], axis=1) / cents["dbar_neg"]
    return w


def weighted_bce(
    yhat: np.ndarray, y: np.ndarray, w: np.ndarray
) -> tuple[float, np.ndarray]:
    """Eq. 12 (negated): mean of w_i · BCE_i; returns (loss, dlogit)."""
    yhat_c = np.clip(yhat, _EPS, 1.0 - _EPS)
    per = -(y * np.log(yhat_c) + (1 - y) * np.log(1 - yhat_c))
    loss = float(np.mean(w * per))
    dlogit = w * (yhat - y) / y.size
    return loss, dlogit
