"""AdaMEL feature representation (§4.2, Eqs. 2-3) as a Spark kernel.

For each candidate pair and each attribute ``A``, the attribute value
pair is split into two contrastive relational features — ``sim(A)``
(shared tokens) and ``uni(A)`` (symmetric difference) — and each
feature is summarized as the *sum of its token embeddings* (Eq. 3).
Empty features embed to the fixed normalized non-zero vector (§4.3).

The kernel runs per-partition via ``mapInPandas`` (Arrow batches): each
partition builds its own :class:`~repro.text.embed.HashEmbedding`
(deterministic, so all executors agree) and emits one flattened
``F·D``-double array per pair. ``mode`` implements the Table-6
ablation: ``"both"`` (default, F=2|A|), ``"shared"`` or ``"unique"``
(F=|A|).
"""
from __future__ import annotations

from collections.abc import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from ..text.embed import DEFAULT_DIM, HashEmbedding
from ..text.tokenize import sim_uni, tokenize

MODES = ("both", "shared", "unique")


def feature_names(attrs: list[str], mode: str = "both") -> list[str]:
    """Feature labels in tensor order — Table-4 style ``<attr>_shared``/``_unique``."""
    if mode not in MODES:
        raise ValueError(f"mode must be one of {MODES}")
    names = []
    for a in attrs:
        if mode in ("both", "shared"):
            names.append(f"{a}_shared")
        if mode in ("both", "unique"):
            names.append(f"{a}_unique")
    return names


def pair_tensor(
    a_vals: list[str | None],
    b_vals: list[str | None],
    emb: HashEmbedding,
    mode: str = "both",
) -> np.ndarray:
    """h ∈ R^{F×D} for one pair given its attribute values (Eq. 3).

    Each feature's token-embedding sum is L2-normalized: raw sums range
    in norm from 1 to the crop size, which destabilizes the per-feature
    affine training (the paper's 300-d FastText vectors are comparably
    bounded). Empty features keep the fixed unit vector (§4.3).
    """
    rows = []
    for va, vb in zip(a_vals, b_vals):
        s, u = sim_uni(tokenize(va), tokenize(vb))
        if mode in ("both", "shared"):
            rows.append(_unit(emb.embed_sum(s)))
        if mode in ("both", "unique"):
            rows.append(_unit(emb.embed_sum(u)))
    return np.stack(rows)


def _unit(v: np.ndarray) -> np.ndarray:
    n = np.linalg.norm(v)
    return v / n if n > 1e-12 else v


def adamel_features(
    pairs_wide: DataFrame,
    attrs: list[str],
    *,
    dim: int = DEFAULT_DIM,
    mode: str = "both",
) -> DataFrame:
    """(pair_id, label, h) DataFrame; ``h`` is the flattened F·D tensor."""
    if mode not in MODES:
        raise ValueError(f"mode must be one of {MODES}")
    a_cols = [f"a_{a}" for a in attrs]
    b_cols = [f"b_{a}" for a in attrs]
    cols = ["pair_id", "label", *a_cols, *b_cols]

    def kernel(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        emb = HashEmbedding(dim)
        for pdf in batches:
            hs = [
                pair_tensor(
                    [row[c] for c in a_cols], [row[c] for c in b_cols], emb, mode
                ).ravel()
                for row in pdf.to_dict("records")
            ]
            yield pd.DataFrame(
                {
                    "pair_id": pdf["pair_id"].values,
                    "label": pdf["label"].astype("float64").values,
                    "h": hs,
                }
            )

    return pairs_wide.select(*cols).mapInPandas(
        kernel, schema="pair_id string, label double, h array<double>"
    )


def collect_features(
    fdf: DataFrame, n_features: int, dim: int = DEFAULT_DIM
) -> tuple[list[str], np.ndarray, np.ndarray]:
    """Collect a feature DataFrame to driver numpy: (ids, y, H[N,F,D])."""
    pdf = fdf.toPandas()
    ids = pdf["pair_id"].tolist()
    y = pdf["label"].to_numpy(dtype=float)
    if len(pdf):
        H = np.stack([np.asarray(h, dtype=float) for h in pdf["h"]])
        H = H.reshape(len(pdf), n_features, dim)
    else:
        H = np.zeros((0, n_features, dim))
    return ids, y, H
