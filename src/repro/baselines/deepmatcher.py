"""DeepMatcher-lite [26]: attribute-summary similarity representation.

DeepMatcher embeds each attribute's word sequence, summarizes it per
attribute (RNN-with-attention in the original; embedding sum here —
the paper's own Eq. 3 simplification), builds a per-attribute
similarity representation and classifies with an MLP. We keep the
defining bias: **attribute-position-locked summaries** — attribute j of
record r is only ever compared with attribute j of r'. Similarity rep
per attribute = [|u−v| ; u⊙v] (the "hybrid" element-wise comparators).
Supervised on D_S only, no adaptation — strong in-domain (Table 7),
brittle under C1-C3.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame

from .common import NumpyMLP, vector_features


def featurize(pairs_wide: DataFrame, attrs: list[str], *, dim: int = 32) -> DataFrame:
    def row_fn(ta, tb, emb) -> np.ndarray:
        out = []
        for a, b in zip(ta, tb):
            u, v = emb.embed_sum(a), emb.embed_sum(b)
            out.append(np.abs(u - v))
            out.append(u * v)
        return np.concatenate(out)

    return vector_features(pairs_wide, attrs, row_fn, dim=dim)


def n_inputs(attrs: list[str], dim: int = 32) -> int:
    return 2 * dim * len(attrs)


def make_model(n_in: int, seed: int = 0) -> NumpyMLP:
    return NumpyMLP(n_in, hidden=[64], seed=seed)
