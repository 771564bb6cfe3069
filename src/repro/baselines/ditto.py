"""Ditto-lite [23]: serialized-record matching (BERT stand-in).

Ditto serializes each record into one tagged sequence
(``[COL] name [VAL] …``) and fine-tunes a pretrained language model,
with TF-IDF summarization of long inputs. Offline we keep the two
defining biases: (1) the record is **one sequence** — no per-attribute
structure survives serialization; (2) tokens are **TF-IDF weighted**
(Ditto's "retain high TF-IDF tokens" summarization, §5.1). Each side
becomes an IDF-weighted embedding sum (attribute-name tag tokens
included); the pair is [|u−v| ; u⊙v] → MLP.

IDF statistics are computed distributedly over the pair table itself
(explode + distinct + groupBy — Catalyst) and shipped to the kernel.
"""
from __future__ import annotations

import math

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from ..pairs.blocking import tokens_col
from .common import NumpyMLP, vector_features


def idf_map(pairs_wide: DataFrame, attrs: list[str]) -> dict[str, float]:
    """token -> idf over the documents {each record side of each pair}."""
    sides = []
    for side in ("a", "b"):
        cols = [F.col(f"{side}_{a}") for a in attrs]
        doc = pairs_wide.select(
            F.concat_ws("|", F.col("pair_id"), F.lit(side)).alias("doc"),
            F.concat_ws(" ", *cols).alias("text"),
        )
        sides.append(doc)
    docs = sides[0].unionByName(sides[1])
    n_docs = docs.count()
    df_counts = (
        docs.select("doc", F.explode(tokens_col("text")).alias("tok"))
        .distinct()
        .groupBy("tok")
        .agg(F.count("*").alias("df"))
        .collect()
    )
    return {r["tok"]: math.log((1 + n_docs) / (1 + r["df"])) for r in df_counts}


def featurize(
    pairs_wide: DataFrame,
    attrs: list[str],
    *,
    dim: int = 32,
    idf: dict[str, float] | None = None,
) -> DataFrame:
    if idf is None:
        idf = idf_map(pairs_wide, attrs)
    default_idf = max(idf.values(), default=1.0)

    def row_fn(ta, tb, emb) -> np.ndarray:
        def serialize(tok_lists):
            u = np.zeros(emb.dim)
            for attr, toks in zip(attrs, tok_lists):
                if not toks:  # Ditto serializes only present attributes
                    continue
                for t in [attr, *toks]:  # [COL] tag token + values
                    u += idf.get(t, default_idf) * emb(t)
            return u

        u, v = serialize(ta), serialize(tb)
        # unit-normalize the sequence embeddings so presence/length
        # patterns (heavy on sparse corpora like Monitor) do not swamp
        # the token signal — the analogue of a normalized [CLS] vector
        for w in (u, v):
            n = np.linalg.norm(w)
            if n > 1e-12:
                w /= n
        return np.concatenate([np.abs(u - v), u * v])

    return vector_features(pairs_wide, attrs, row_fn, dim=dim)


def n_inputs(attrs: list[str], dim: int = 32) -> int:
    return 2 * dim


def make_model(n_in: int, seed: int = 0) -> NumpyMLP:
    return NumpyMLP(n_in, hidden=[64], seed=seed)
