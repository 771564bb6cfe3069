"""Scenario harness: featurize once, train/evaluate every method.

A :class:`Scenario` bundles the three wide pair DataFrames (D_S train,
S_U support, D_T test — the paper's transductive setup where D_T is
also the unlabeled adaptation set) plus the aligned attribute schema.
``evaluate_methods`` featurizes each representation exactly once per
scenario, then trains every requested method over ``n_seeds`` seeds and
reports mean ± std of the metric (paper: 3 runs, mean and std).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import DataFrame

from ..baselines import cordel, deepmatcher, ditto, entitymatcher, tler
from ..baselines.common import collect_vectors
from ..core.model import ModelConfig, attention, predict
from ..core.train import TrainConfig, fit_adamel
from ..metrics import f1_at, pr_auc
from ..pairs.features import adamel_features, collect_features, feature_names

BASELINE_MODULES = {
    "TLER": tler,
    "DeepMatcher": deepmatcher,
    "EntityMatcher": entitymatcher,
    "Ditto": ditto,
    "CorDel-Attention": cordel,
}

ADAMEL_METHODS = ("AdaMEL-base", "AdaMEL-zero", "AdaMEL-few", "AdaMEL-hyb")
ALL_METHODS = (*BASELINE_MODULES, *ADAMEL_METHODS)


@dataclass
class Scenario:
    """One MEL evaluation setting (dataset × entity type × S1/S2)."""

    attrs: list[str]
    train: DataFrame
    support: DataFrame
    test: DataFrame
    dim: int = 32
    mode: str = "both"  # Table-6 ablation knob
    _adamel_cache: dict = field(default_factory=dict, repr=False)
    _baseline_cache: dict = field(default_factory=dict, repr=False)

    def adamel_data(self) -> dict[str, tuple]:
        """Collected (ids, y, H) per split for the AdaMEL tensor."""
        key = (self.mode, tuple(self.attrs))
        if key not in self._adamel_cache:
            F_ = len(feature_names(self.attrs, self.mode))
            self._adamel_cache[key] = {
                split: collect_features(
                    adamel_features(df, self.attrs, dim=self.dim, mode=self.mode),
                    F_,
                    self.dim,
                )
                for split, df in (
                    ("train", self.train),
                    ("support", self.support),
                    ("test", self.test),
                )
            }
        return self._adamel_cache[key]

    def baseline_data(self, name: str) -> dict[str, tuple]:
        """Collected (ids, y, X) per split for one baseline."""
        if name not in self._baseline_cache:
            mod = BASELINE_MODULES[name]
            self._baseline_cache[name] = {
                split: collect_vectors(mod.featurize(df, self.attrs, dim=self.dim))
                for split, df in (
                    ("train", self.train),
                    ("support", self.support),
                    ("test", self.test),
                )
            }
        return self._baseline_cache[name]


def run_adamel(
    scenario: Scenario,
    variant: str,
    *,
    seed: int = 0,
    train_cfg: TrainConfig | None = None,
) -> dict:
    """Train one AdaMEL variant on the scenario; returns scores + model.

    Baselines see only D_S; ``few``/``hyb`` additionally use S_U labels
    and ``zero``/``hyb`` the unlabeled test features (G1/G2, §3.1).
    """
    data = scenario.adamel_data()
    _, y_tr, H_tr = data["train"]
    _, y_sup, H_sup = data["support"]
    _, y_te, H_te = data["test"]
    F_ = H_tr.shape[1]
    cfg = train_cfg or TrainConfig()
    cfg = TrainConfig(**{**cfg.__dict__, "seed": seed})
    model_cfg = ModelConfig(n_features=F_, dim=scenario.dim, seed=seed)
    res = fit_adamel(
        variant.replace("AdaMEL-", ""),
        model_cfg,
        cfg,
        H_tr,
        y_tr,
        H_tgt=H_te,
        H_sup=H_sup,
        y_sup=y_sup,
    )
    scores = predict(res.params, H_te)
    return {
        "y": y_te,
        "scores": scores,
        "params": res.params,
        "history": res.history,
        "attention_target": attention(res.params, H_te).mean(axis=0),
        "feature_names": feature_names(scenario.attrs, scenario.mode),
    }


def run_baseline(scenario: Scenario, name: str, *, seed: int = 0) -> dict:
    """Train one baseline (supervised on D_S only) and score the test set."""
    mod = BASELINE_MODULES[name]
    data = scenario.baseline_data(name)
    _, y_tr, X_tr = data["train"]
    _, y_te, X_te = data["test"]
    model = mod.make_model(X_tr.shape[1], seed=seed).fit(X_tr, y_tr)
    return {"y": y_te, "scores": model.predict(X_te)}


def run_method(scenario: Scenario, name: str, *, seed: int = 0,
               train_cfg: TrainConfig | None = None) -> dict:
    if name in BASELINE_MODULES:
        return run_baseline(scenario, name, seed=seed)
    if name in ADAMEL_METHODS:
        return run_adamel(scenario, name, seed=seed, train_cfg=train_cfg)
    raise ValueError(f"unknown method {name!r}")


def evaluate_methods(
    scenario: Scenario,
    methods: list[str],
    *,
    metric: str = "prauc",
    n_seeds: int = 1,
    train_cfg: TrainConfig | None = None,
) -> dict[str, tuple[float, float]]:
    """{method: (mean, std)} of PRAUC (or F1) over ``n_seeds`` runs."""
    score_fn = pr_auc if metric == "prauc" else f1_at
    out = {}
    for name in methods:
        vals = []
        for s in range(n_seeds):
            r = run_method(scenario, name, seed=s, train_cfg=train_cfg)
            vals.append(score_fn(r["y"], r["scores"]))
        out[name] = (float(np.mean(vals)), float(np.std(vals)))
    return out
