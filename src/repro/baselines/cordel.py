"""CorDel-lite [37]: contrast-first deep linkage.

CorDel compares-and-contrasts the two records *before* embedding so
small-but-critical token differences survive summarization. That is
exactly AdaMEL's sim/uni contrastive split (the paper credits [37] for
it) — so CorDel-lite uses the same contrastive feature tensor as
AdaMEL but **without** attribute-level attention and **without** domain
adaptation: flattened sim/uni embeddings → MLP, supervised on D_S.
The AdaMEL − CorDel gap therefore isolates the paper's contribution
(attention as transferable knowledge + DA).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame

from ..text.tokenize import sim_uni
from .common import NumpyMLP, vector_features


def featurize(pairs_wide: DataFrame, attrs: list[str], *, dim: int = 32) -> DataFrame:
    def row_fn(ta, tb, emb) -> np.ndarray:
        rows = []
        for a, b in zip(ta, tb):
            s, u = sim_uni(a, b)
            rows.append(emb.embed_sum(s))
            rows.append(emb.embed_sum(u))
        return np.concatenate(rows)

    return vector_features(pairs_wide, attrs, row_fn, dim=dim)


def n_inputs(attrs: list[str], dim: int = 32) -> int:
    return 2 * dim * len(attrs)


def make_model(n_in: int, seed: int = 0) -> NumpyMLP:
    return NumpyMLP(n_in, hidden=[64], seed=seed)
