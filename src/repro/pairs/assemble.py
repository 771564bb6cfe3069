"""Pair assembly: candidate ids ⋈ records ⋈ records → wide pair table.

Joins each candidate pair back to both records' attribute values
(prefixed ``a_`` / ``b_``), attaches the ground-truth label
(``entity_id`` equality) and a stable ``pair_id``. Also provides the
paper's *ontology alignment* (§4.1): the union of two schemas with
empty-string "dummy" values for attributes a record's source never
emitted.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def align_ontology(records: DataFrame, attrs: list[str]) -> DataFrame:
    """Ensure every attribute column exists; missing ones become ``""``.

    This is Eq.-free but load-bearing: AdaMEL requires D_S and D_T to
    share one attribute schema (the union ontology, §4.1), with blank
    dummies for attributes a source never has (C2).
    """
    out = records
    for a in attrs:
        if a not in records.columns:
            out = out.withColumn(a, F.lit(""))
        else:
            out = out.withColumn(a, F.coalesce(F.col(a), F.lit("")))
    return out


def assemble_pairs(
    pairs: DataFrame, records: DataFrame, attrs: list[str]
) -> DataFrame:
    """Wide labeled pair table.

    Output columns: ``pair_id``, ``id_a``, ``id_b``, ``source_a``,
    ``source_b``, ``entity_type``, ``label`` (1.0 match / 0.0
    non-match) and ``a_<attr>`` / ``b_<attr>`` for every attribute.
    """
    records = align_ontology(records, attrs)
    a_cols = [F.col(c).alias(f"a_{c}") for c in attrs]
    b_cols = [F.col(c).alias(f"b_{c}") for c in attrs]
    ra = records.select(
        F.col("record_id").alias("id_a"),
        F.col("source").alias("source_a"),
        F.col("entity_id").alias("ent_a"),
        F.col("entity_type").alias("type_a"),
        *a_cols,
    )
    rb = records.select(
        F.col("record_id").alias("id_b"),
        F.col("source").alias("source_b"),
        F.col("entity_id").alias("ent_b"),
        F.col("entity_type").alias("type_b"),
        *b_cols,
    )
    wide = (
        pairs.join(ra, "id_a")
        .join(rb, "id_b")
        .withColumn("label", (F.col("ent_a") == F.col("ent_b")).cast("double"))
        .withColumn("pair_id", F.concat_ws("|", "id_a", "id_b"))
        .withColumn("entity_type", F.col("type_a"))
        .drop("ent_a", "ent_b", "type_a", "type_b")
    )
    return wide


def weaken_labels(wide: DataFrame, flip_p: float, seed: int = 0) -> DataFrame:
    """Weak-label corruption for Music-1M-lite (§5.1).

    Music-1M labels pairs by following website hyperlinks, producing
    label noise (including mixed-type matches). We model that as a
    deterministic pseudo-random label flip with probability ``flip_p``,
    keyed on ``pair_id`` via ``xxhash64`` so the corruption is stable
    across runs and Catalyst-reproducible.
    """
    h = F.pmod(F.xxhash64(F.col("pair_id"), F.lit(seed)), F.lit(1_000_000))
    return wide.withColumn(
        "label",
        F.when(h < int(flip_p * 1_000_000), 1.0 - F.col("label")).otherwise(
            F.col("label")
        ),
    )
