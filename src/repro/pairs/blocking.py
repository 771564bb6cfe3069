"""Candidate-pair generation via token-key blocking (Catalyst joins).

The paper's corpora come with labeled pairs; in our reproduction the
pairs are *generated* the way production EL pipelines do it: blocking
on shared word tokens of a key attribute, then a distributed self-join.
This is the repo's distributed-dataflow backbone (repro hint:
"joining candidate pairs for entity linkage across sources").

Everything here is pure DataFrame/Catalyst (explode + equi-join +
distinct); tests oracle-check the result against the equivalent DuckDB
SQL.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

TOKEN_SPLIT = "[^0-9a-z]+"


def tokens_col(col: str | Column) -> Column:
    """Tokenize a string column the same way ``text.tokenize`` does.

    Lowercase, split on non-alphanumerics, drop empties. (Cropping to
    20 tokens matters for embeddings, not for blocking keys, so it is
    not applied here.)
    """
    c = F.col(col) if isinstance(col, str) else col
    return F.filter(F.split(F.lower(c), TOKEN_SPLIT), lambda x: x != F.lit(""))


def block_pairs(
    records: DataFrame,
    key_attr: str,
    *,
    max_df: int = 100,
    cross_source_only: bool = True,
    same_type: bool = True,
) -> DataFrame:
    """Distinct candidate pairs sharing >=1 token of ``key_attr``.

    * ``max_df`` drops blocking tokens appearing in more than ``max_df``
      records (stop-token guard bounding the join blowup);
    * ``cross_source_only`` keeps only pairs from different data
      sources (MEL links *across* sources);
    * ``same_type`` restricts to equal ``entity_type`` (clean corpora;
      Music-1M weak labeling relaxes this upstream).

    Returns columns ``id_a < id_b`` (lexicographic, so each unordered
    pair appears once).
    """
    toks = records.select(
        "record_id",
        "source",
        "entity_type",
        F.explode(tokens_col(key_attr)).alias("tok"),
    ).distinct()
    df_counts = toks.groupBy("tok").agg(F.count("*").alias("df"))
    toks = toks.join(df_counts.where(F.col("df") <= max_df), "tok")

    a = toks.select(
        F.col("tok"),
        F.col("record_id").alias("id_a"),
        F.col("source").alias("src_a"),
        F.col("entity_type").alias("type_a"),
    )
    b = toks.select(
        F.col("tok"),
        F.col("record_id").alias("id_b"),
        F.col("source").alias("src_b"),
        F.col("entity_type").alias("type_b"),
    )
    cond = [a.tok == b.tok, a.id_a < b.id_b]
    pairs = a.join(b, cond)
    if cross_source_only:
        pairs = pairs.where(F.col("src_a") != F.col("src_b"))
    if same_type:
        pairs = pairs.where(F.col("type_a") == F.col("type_b"))
    return pairs.select("id_a", "id_b").distinct()


def random_pairs(
    records: DataFrame,
    *,
    n_buckets: int = 32,
    keep_per_million: int = 200_000,
    seed: int = 0,
    same_type: bool = True,
) -> DataFrame:
    """Deterministic pseudo-random cross-source pairs (easy negatives).

    Token blocking only surfaces *hard* candidates; real pipelines mix
    in random pairs so classifiers also see easy negatives. Records are
    hashed into ``n_buckets`` buckets, joined within-bucket (bounding
    the quadratic blowup), and thinned with an ``xxhash64`` coin keeping
    ``keep_per_million`` ppm of pairs. Fully deterministic in ``seed``.
    """
    bucketed = records.select(
        "record_id",
        "source",
        "entity_type",
        F.pmod(F.xxhash64("record_id", F.lit(seed)), F.lit(n_buckets)).alias("bkt"),
    )
    a = bucketed.select(
        "bkt",
        F.col("record_id").alias("id_a"),
        F.col("source").alias("src_a"),
        F.col("entity_type").alias("type_a"),
    )
    b = bucketed.select(
        "bkt",
        F.col("record_id").alias("id_b"),
        F.col("source").alias("src_b"),
        F.col("entity_type").alias("type_b"),
    )
    pairs = a.join(b, ["bkt"]).where(
        (F.col("id_a") < F.col("id_b")) & (F.col("src_a") != F.col("src_b"))
    )
    if same_type:
        pairs = pairs.where(F.col("type_a") == F.col("type_b"))
    coin = F.pmod(F.xxhash64("id_a", "id_b", F.lit(seed + 1)), F.lit(1_000_000))
    return pairs.where(coin < keep_per_million).select("id_a", "id_b").distinct()
