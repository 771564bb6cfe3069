"""TLER baseline [34]: non-deep transfer via a standard feature space.

TLER defines a dataset-agnostic "standard feature space" of classic
per-attribute string similarities and *reuses* the model trained on
seen data for the new domain. We reproduce that bias exactly:
6 similarity statistics per attribute + logistic regression, trained on
D_S only and applied unchanged to D_T.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame

from .common import NumpyMLP, sim_stats, vector_features

N_STATS = 6


def featurize(pairs_wide: DataFrame, attrs: list[str], *, dim: int = 32) -> DataFrame:
    def row_fn(ta, tb, emb) -> np.ndarray:
        out = []
        for a, b in zip(ta, tb):
            out.extend(sim_stats(a, b))
        return np.asarray(out)

    return vector_features(pairs_wide, attrs, row_fn, dim=dim)


def n_inputs(attrs: list[str], dim: int = 32) -> int:
    return N_STATS * len(attrs)


def make_model(n_in: int, seed: int = 0) -> NumpyMLP:
    # logistic regression: no hidden layer
    return NumpyMLP(n_in, hidden=[], seed=seed)
