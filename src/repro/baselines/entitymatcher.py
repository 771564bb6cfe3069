"""EntityMatcher-lite [11]: token-level cross-attribute alignment.

EntityMatcher (hierarchical matching network) jointly matches at the
token, attribute and entity level; its token-level strategy allows
**cross-attribute alignment** — a token may align with any token of
the other record regardless of attribute position. We keep exactly
that bias: cosine alignment matrix between the two records' full token
sets, max-pooled per token, averaged per attribute and globally.
This makes it the most shift-robust baseline (best baseline in
Tables 8-9) and the slowest (quadratic in token count — Fig. 9).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame

from .common import NumpyMLP, vector_features


def _aligned_stats(
    ta: list[list[str]], tb: list[list[str]], emb
) -> tuple[list[float], list[float], float, float]:
    """Alignment statistics of a-side tokens into *all* of b's tokens.

    Per attribute: mean and min of each token's max cosine alignment
    (the min captures "this attribute contains a token nothing on the
    other side explains" — the entity-level mismatch evidence of the
    hierarchical matcher). Globally: mean alignment and the fraction of
    unmatched tokens (max-sim < 0.5).
    """
    all_b = [emb(t) for toks in tb for t in toks]
    B = np.stack(all_b) if all_b else None
    means, mins, flat = [], [], []
    for toks in ta:
        if not toks or B is None:
            means.append(0.0)
            mins.append(0.0)
            continue
        A = np.stack([emb(t) for t in toks])
        sims = (A @ B.T).max(axis=1)  # embeddings are unit-norm
        means.append(float(sims.mean()))
        mins.append(float(sims.min()))
        flat.extend(sims.tolist())
    g_mean = float(np.mean(flat)) if flat else 0.0
    unmatched = float(np.mean(np.asarray(flat) < 0.5)) if flat else 0.0
    return means, mins, g_mean, unmatched


def featurize(pairs_wide: DataFrame, attrs: list[str], *, dim: int = 32) -> DataFrame:
    def row_fn(ta, tb, emb) -> np.ndarray:
        ma, na, ga, ua = _aligned_stats(ta, tb, emb)
        mb, nb, gb, ub = _aligned_stats(tb, ta, emb)
        return np.asarray(ma + na + mb + nb + [ga, gb, ua, ub])

    return vector_features(pairs_wide, attrs, row_fn, dim=dim)


def n_inputs(attrs: list[str], dim: int = 32) -> int:
    return 4 * len(attrs) + 4


def make_model(n_in: int, seed: int = 0) -> NumpyMLP:
    return NumpyMLP(n_in, hidden=[32], seed=seed)
