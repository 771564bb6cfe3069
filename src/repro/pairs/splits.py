"""D_S / S_U / D_T split construction (§3.2, §5.2 scenarios S1/S2).

Pools are defined by source-domain membership of the two records:

* ``source``   — both records from source-domain sources → labeled
  training pool **D_S**;
* ``mixed``    — exactly one record from a target-only source
  (``(r,r') ∈ D_S* × D_T*``);
* ``disjoint`` — both records from target-only sources
  (``(r,r') ∈ D_T* × D_T*``).

Scenario **S1 (overlapping)** tests on ``mixed ∪ disjoint`` (at least
one unseen-source record); **S2 (disjoint)** tests on ``disjoint``
only. The support set S_U is sampled from the same pool as the test
set, disjoint from it (paper: 50 positive + 50 negative, §5.2). The
unlabeled adaptation set D_T is the test set itself with labels
withheld — AdaMEL is transductive (Alg. 1 infers ŷ for x_i ∈ D_T).

All sampling is deterministic via ``xxhash64(pair_id, seed)`` ordering
so the oracle and repeated runs see identical splits.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F


@dataclass(frozen=True)
class SplitSizes:
    train_pos: int
    train_neg: int
    support_pos: int = 50
    support_neg: int = 50
    test_pos: int = 250
    test_neg: int = 250


def with_pool(wide: DataFrame, source_domain: list[str]) -> DataFrame:
    """Tag each pair with its domain pool (see module docstring)."""
    in_a = F.col("source_a").isin(source_domain).cast("int")
    in_b = F.col("source_b").isin(source_domain).cast("int")
    n_in = in_a + in_b
    return wide.withColumn(
        "pool",
        F.when(n_in == 2, "source").when(n_in == 1, "mixed").otherwise("disjoint"),
    )


def sample_split(
    df: DataFrame, n_pos: int, n_neg: int, seed: int, exclude: DataFrame | None = None
) -> DataFrame:
    """Deterministic stratified sample: ``n_pos`` / ``n_neg`` pairs.

    ``exclude`` (a DataFrame with ``pair_id``) is anti-joined out first
    so, e.g., the support set never leaks test pairs.
    """
    if exclude is not None:
        df = df.join(exclude.select("pair_id"), "pair_id", "left_anti")
    w = Window.partitionBy("label").orderBy(F.xxhash64("pair_id", F.lit(seed)))
    ranked = df.withColumn("_rk", F.row_number().over(w))
    out = ranked.where(
        ((F.col("label") == 1.0) & (F.col("_rk") <= n_pos))
        | ((F.col("label") == 0.0) & (F.col("_rk") <= n_neg))
    ).drop("_rk")
    return out


def make_scenario(
    wide: DataFrame,
    source_domain: list[str],
    scenario: str,
    sizes: SplitSizes,
    seed: int = 0,
) -> dict[str, DataFrame]:
    """Build ``{"train", "support", "test"}`` wide pair DataFrames.

    ``wide`` is an assembled labeled pair table (``assemble_pairs``
    output, possibly filtered to one entity type); ``scenario`` is
    ``"overlap"`` (S1) or ``"disjoint"`` (S2).
    """
    if scenario not in ("overlap", "disjoint"):
        raise ValueError(f"unknown scenario {scenario!r}")
    pooled = with_pool(wide, source_domain).cache()
    train_pool = pooled.where(F.col("pool") == "source")
    if scenario == "overlap":
        test_pool = pooled.where(F.col("pool") != "source")
    else:
        test_pool = pooled.where(F.col("pool") == "disjoint")

    train = sample_split(train_pool, sizes.train_pos, sizes.train_neg, seed)
    test = sample_split(test_pool, sizes.test_pos, sizes.test_neg, seed + 1)
    support = sample_split(
        test_pool, sizes.support_pos, sizes.support_neg, seed + 2, exclude=test
    )
    return {"train": train, "support": support, "test": test}
