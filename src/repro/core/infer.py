"""Distributed inference and attention statistics (broadcast model).

The trained model is a small dict of numpy arrays; scoring and the
mean target-domain attention f̄(x') (Eq. 10's inner average) are
data-parallel over pairs, so both run as ``mapInPandas`` kernels over
the feature DataFrame with the parameters shipped in the task closure.
Tests assert both kernels agree with the driver-side numpy computation
to 1e-6.
"""
from __future__ import annotations

from collections.abc import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from .model import attention, predict


def _stack(pdf: pd.DataFrame, n_features: int, dim: int) -> np.ndarray:
    H = np.stack([np.asarray(h, dtype=float) for h in pdf["h"]])
    return H.reshape(len(pdf), n_features, dim)


def score_distributed(
    fdf: DataFrame, params: dict[str, np.ndarray], n_features: int, dim: int
) -> DataFrame:
    """(pair_id, label, score) — ŷ for every pair, computed per partition."""

    def kernel(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if not len(pdf):
                continue
            yhat = predict(params, _stack(pdf, n_features, dim))
            yield pd.DataFrame(
                {"pair_id": pdf["pair_id"], "label": pdf["label"], "score": yhat}
            )

    return fdf.mapInPandas(
        kernel, schema="pair_id string, label double, score double"
    )


def mean_attention_distributed(
    fdf: DataFrame, params: dict[str, np.ndarray], n_features: int, dim: int
) -> np.ndarray:
    """f̄(x') ∈ (F,): attention averaged over all pairs in ``fdf``.

    Each partition emits a partial (Σg, n); the driver combines — an
    exact distributed mean, independent of partitioning.
    """

    def kernel(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if not len(pdf):
                continue
            g = attention(params, _stack(pdf, n_features, dim))
            yield pd.DataFrame({"g_sum": [g.sum(axis=0).tolist()], "n": [len(pdf)]})

    parts = fdf.mapInPandas(kernel, schema="g_sum array<double>, n long").collect()
    if not parts:
        return np.full(n_features, 1.0 / n_features)
    total = np.sum([np.asarray(r["g_sum"]) for r in parts], axis=0)
    n = sum(r["n"] for r in parts)
    return total / n
