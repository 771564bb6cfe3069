"""Training loops for the four AdaMEL variants (Algorithms 1-3) + Adam.

``fit_adamel(variant, ...)`` implements:

* ``base`` — supervised L_base on D_S only (§4.3, Fig. 4);
* ``zero`` — unsupervised DA, L_un = (1−λ)L_base + λL_target (Alg. 1);
* ``few``  — semi-supervised, L_ssl = L_base + φL_support (Alg. 2);
* ``hyb``  — L_hybrid = (1−λ)L_base + λL_target + φL_support (Alg. 3).

Per the algorithms, the target mean attention f̄(x') and the D_S class
centroids are recomputed from the *current* parameters at the top of
every epoch, then treated as constants during that epoch's batch
updates. Unlike Alg. 1 line 7 (one random batch per epoch) we sweep all
minibatches per epoch — same objective, faster convergence at our
reduced epoch count (documented in DESIGN.md §6).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from . import losses
from .model import ModelConfig, backward, fit_standardizer, forward, init_params, standardize


@dataclass
class TrainConfig:
    epochs: int = 100
    batch_size: int = 128
    lr: float = 2e-3
    lam: float = 0.98  # λ, Eq. 9 — weight of target-domain adaptation
    phi: float = 1.0  # φ, Eq. 13 — weight of the support-set loss
    seed: int = 0
    # Model-justification knobs (defaults = the configuration used for
    # the reproduction tables; see losses.kl_target and §4.4.1 note):
    kl_per_pair: bool = False  # literal Eq. 10 vs batch-mean matching
    kl_routing: str = "all"  # "all" | "attention" (update only W, a)
    # Damping on the KL gradient share reaching the feature projections
    # V, b (the attention parameters W, a always receive it in full —
    # §4.4.1 "updates W and a"). 1.0 = Alg. 1's joint update; 0.0 ≡
    # "attention" routing. Only meaningful with kl_routing="all".
    kl_feature_scale: float = 0.1
    # Positive-class loss weight: "balanced" = n_neg/n_pos of the
    # training split (capped at 20), or an explicit float; 1.0 = off.
    class_balance: float | str = "balanced"
    # §4.4.1 opens with "adjust the *learned* attribute importance
    # according to the new distribution": adaptation starts after the
    # importance has been learned — the first ``warmup`` fraction of
    # epochs trains supervised-only, the rest jointly with L_target.
    warmup: float = 0.9


class Adam:
    """Adam optimizer (Kingma & Ba) over a dict of parameter arrays."""

    def __init__(self, params: dict[str, np.ndarray], lr: float = 3e-3,
                 beta1: float = 0.9, beta2: float = 0.999, eps: float = 1e-8):
        self.lr, self.b1, self.b2, self.eps = lr, beta1, beta2, eps
        self.t = 0
        self.m = {k: np.zeros_like(v) for k, v in params.items()}
        self.v = {k: np.zeros_like(v) for k, v in params.items()}

    def step(self, params: dict[str, np.ndarray], grads: dict[str, np.ndarray]) -> None:
        self.t += 1
        for k, g in grads.items():
            self.m[k] = self.b1 * self.m[k] + (1 - self.b1) * g
            self.v[k] = self.b2 * self.v[k] + (1 - self.b2) * g * g
            mhat = self.m[k] / (1 - self.b1**self.t)
            vhat = self.v[k] / (1 - self.b2**self.t)
            params[k] -= self.lr * mhat / (np.sqrt(vhat) + self.eps)


@dataclass
class FitResult:
    params: dict[str, np.ndarray]
    history: list[dict] = field(default_factory=list)


def _chunked_attention(params: dict, H: np.ndarray, chunk: int = 4096) -> np.ndarray:
    out = [forward(params, H[i : i + chunk])["g"] for i in range(0, len(H), chunk)]
    return np.concatenate(out) if out else np.zeros((0, H.shape[1]))


VARIANTS = ("base", "zero", "few", "hyb")


def fit_adamel(
    variant: str,
    model_cfg: ModelConfig,
    train_cfg: TrainConfig,
    H_src: np.ndarray,
    y_src: np.ndarray,
    H_tgt: np.ndarray | None = None,
    H_sup: np.ndarray | None = None,
    y_sup: np.ndarray | None = None,
) -> FitResult:
    """Train one AdaMEL variant; returns parameters + loss history."""
    if variant not in VARIANTS:
        raise ValueError(f"variant must be one of {VARIANTS}")
    use_target = variant in ("zero", "hyb")
    use_support = variant in ("few", "hyb")
    if use_target and (H_tgt is None or len(H_tgt) == 0):
        raise ValueError(f"variant {variant!r} needs unlabeled target features H_tgt")
    if use_support and (H_sup is None or y_sup is None or len(H_sup) == 0):
        raise ValueError(f"variant {variant!r} needs labeled support features H_sup/y_sup")

    params = init_params(model_cfg)
    # Standardize inputs (stats stored in params so inference applies
    # the same transform — see model.standardize). Variants with access
    # to the unlabeled target domain fit the statistics on D_S ∪ D_T —
    # the §4.4.1 premise of projecting both domains into one shared
    # feature space (first-moment alignment is the cheapest form of it,
    # and is exactly the "massive unlabeled data" leverage of G1);
    # base/few see only the data their scenario grants them.
    stats_pool = (
        np.concatenate([H_src, H_tgt]) if use_target else H_src
    )
    fit_standardizer(params, stats_pool)
    H_src = standardize(params, H_src)
    H_tgt = standardize(params, H_tgt) if H_tgt is not None else None
    H_sup = standardize(params, H_sup) if H_sup is not None else None
    opt = Adam(params, lr=train_cfg.lr)
    rng = np.random.default_rng(train_cfg.seed)
    history: list[dict] = []
    if train_cfg.class_balance == "balanced":
        n_pos = max(1.0, float((y_src == 1.0).sum()))
        pos_w = min(20.0, float((y_src == 0.0).sum()) / n_pos)
    else:
        pos_w = float(train_cfg.class_balance)

    warmup_epochs = int(train_cfg.warmup * train_cfg.epochs) if use_target else 0
    for epoch in range(train_cfg.epochs):
        adapting = use_target and epoch >= warmup_epochs
        # During warmup the supervised loss runs at full strength (the
        # importance must be *learned* before it is adapted, §4.4.1);
        # in the adaptation phase the paper's (1−λ)/λ mix applies — at
        # λ=1 the supervised signal vanishes entirely there, which is
        # what produces the Fig. 8 drop.
        lam = train_cfg.lam if adapting else 0.0
        fbar = _chunked_attention(params, H_tgt).mean(axis=0) if adapting else None
        cents = (
            losses.class_centroids(_chunked_attention(params, H_src), y_src)
            if use_support
            else None
        )
        order = rng.permutation(len(H_src))
        ep = {"epoch": epoch, "base": 0.0, "target": 0.0, "support": 0.0}
        n_batches = 0
        for start in range(0, len(order), train_cfg.batch_size):
            idx = order[start : start + train_cfg.batch_size]
            cache = forward(params, H_src[idx])
            l_base, dlogit = losses.bce(cache["yhat"], y_src[idx], pos_weight=pos_w)
            grads = backward(params, cache, (1.0 - lam) * dlogit)
            if adapting:
                # The adaptation gradient flows to every parameter by
                # default (the KL reaches W, a directly and V, b via x
                # — Alg. 1 line 12 updates a, W, V, b); "attention"
                # routing (update only W, a, per the §4.4.1 sentence)
                # is kept as a model-justification knob.
                l_tgt, dg_kl = losses.kl_target(
                    cache["g"], fbar, per_pair=train_cfg.kl_per_pair
                )
                kl_grads = backward(
                    params, cache, np.zeros(len(idx)), lam * dg_kl
                )
                if train_cfg.kl_routing == "attention":
                    scales = {"W": 1.0, "a": 1.0}
                else:
                    fs = train_cfg.kl_feature_scale
                    scales = {"W": 1.0, "a": 1.0, "V": fs, "b": fs}
                for k, s in scales.items():
                    grads[k] = grads[k] + s * kl_grads[k]
                ep["target"] += l_tgt
            opt.step(params, grads)
            ep["base"] += l_base
            n_batches += 1
        if use_support:
            cache = forward(params, H_sup)
            w = losses.support_weights(cache["g"], y_sup, cents)
            l_sup, dlogit = losses.weighted_bce(cache["yhat"], y_sup, w)
            dlogit = train_cfg.phi * dlogit
            grads = backward(params, cache, dlogit, None)
            opt.step(params, grads)
            ep["support"] = l_sup
        ep["base"] /= max(n_batches, 1)
        ep["target"] /= max(n_batches, 1)
        history.append(ep)
    return FitResult(params=params, history=history)
