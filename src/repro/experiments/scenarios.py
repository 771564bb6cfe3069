"""End-to-end scenario builders: corpus → candidates → splits → Scenario.

One function per evaluation setting of the paper:

* :func:`music_scenario`   — Music-3K-lite / Music-1M-lite (``weak=True``),
  per entity type, S1 ``"overlap"`` / S2 ``"disjoint"`` (§5.2 setup);
* :func:`monitor_scenario` — Monitor-lite, S1/S2;
* :func:`benchmark_scenario` — Table-7 single-domain datasets.

Candidate pairs are token-blocking hits (hard candidates) unioned with
deterministic random pairs (easy negatives) — the standard production
recipe; labels come from ground-truth entity ids via the assembly join.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..datagen import benchmark as bench
from ..datagen import monitor as mon
from ..datagen import music as mus
from ..pairs.assemble import assemble_pairs, weaken_labels
from ..pairs.blocking import block_pairs, random_pairs
from ..pairs.splits import SplitSizes, make_scenario, sample_split
from .harness import Scenario

MUSIC_SIZES = SplitSizes(
    train_pos=120, train_neg=240, support_pos=50, support_neg=50,
    test_pos=150, test_neg=250,
)
# Music-1M: an order of magnitude more (weakly) labeled training pairs,
# same clean test set as Music-3K (§5.1 / Table 3 structure).
MUSIC_1M_SIZES = SplitSizes(
    train_pos=450, train_neg=1100, support_pos=50, support_neg=50,
    test_pos=150, test_neg=250,
)
# Monitor: >96% negative training pairs, test = all-positives + 1000
# negatives (App. A.1: 432 pos + 1000 neg; ours scaled).
MONITOR_SIZES = SplitSizes(
    train_pos=130, train_neg=1800, support_pos=50, support_neg=50,
    test_pos=130, test_neg=1000,
)
BENCH_SIZES = SplitSizes(
    train_pos=120, train_neg=240, support_pos=50, support_neg=50,
    test_pos=100, test_neg=200,
)


def materialize(df: DataFrame) -> DataFrame:
    """Collect a (small) split and re-create it as a literal DataFrame.

    Split DataFrames are lazy plans over blocking joins + window
    sampling; every downstream featurization would otherwise re-execute
    the whole join pipeline. Splits are a few thousand rows, so we pin
    them as in-memory literal frames (repartitioned for mapInPandas
    parallelism).
    """
    spark = df.sparkSession
    schema = df.schema
    pdf = df.toPandas()
    n_part = max(1, min(8, len(pdf) // 250))
    return spark.createDataFrame(pdf, schema=schema).repartition(n_part).cache()


def candidate_pairs(
    records: DataFrame,
    key_attr: str,
    *,
    seed: int = 0,
    max_df: int = 100,
    n_buckets: int = 32,
    keep_per_million: int = 40_000,
) -> DataFrame:
    """Blocking hits ∪ random pairs, distinct."""
    blocked = block_pairs(records, key_attr, max_df=max_df)
    rand = random_pairs(
        records, n_buckets=n_buckets, keep_per_million=keep_per_million, seed=seed
    )
    return blocked.unionByName(rand).distinct()


def music_scenario(
    spark: SparkSession,
    entity_type: str,
    scenario: str,
    *,
    n_per_type: int | None = None,
    weak: bool = False,
    seed: int = 0,
    sizes: SplitSizes | None = None,
) -> Scenario:
    """Music MEL scenario for one entity type (artist/album/track)."""
    if n_per_type is None:
        # Music-1M-lite: a larger universe supplies the bigger weak
        # training pool; the clean test sizes stay Music-3K's.
        n_per_type = 600 if weak else 260
    records = mus.music_records(spark, n_per_type=n_per_type, seed=seed).cache()
    cands = candidate_pairs(records, "name", seed=seed)
    wide = assemble_pairs(cands, records, mus.ATTRS).where(
        F.col("entity_type") == entity_type
    ).cache()
    sz = sizes or (MUSIC_1M_SIZES if weak else MUSIC_SIZES)
    splits = make_scenario(wide, mus.SOURCE_DOMAIN, scenario, sz, seed=seed)
    train = splits["train"]
    if weak:  # Music-1M hyperlink-style label noise on training data only
        train = weaken_labels(train, flip_p=0.15, seed=seed)
    return Scenario(
        attrs=mus.ATTRS,
        train=materialize(train),
        support=materialize(splits["support"]),
        test=materialize(splits["test"]),
    )


def monitor_scenario(
    spark: SparkSession,
    scenario: str,
    *,
    n_entities: int = 420,
    seed: int = 0,
    sizes: SplitSizes | None = None,
    source_domain: list[str] | None = None,
) -> Scenario:
    """Monitor MEL scenario (S1 overlapping / S2 disjoint)."""
    records = mon.monitor_records(spark, n_entities=n_entities, seed=seed).cache()
    cands = candidate_pairs(
        records, "page_title", seed=seed, n_buckets=16, keep_per_million=400_000
    )
    wide = assemble_pairs(cands, records, mon.ATTRS).cache()
    splits = make_scenario(
        wide,
        source_domain or mon.SOURCE_DOMAIN,
        scenario,
        sizes or MONITOR_SIZES,
        seed=seed,
    )
    return Scenario(
        attrs=mon.ATTRS,
        train=materialize(splits["train"]),
        support=materialize(splits["support"]),
        test=materialize(splits["test"]),
    )


def benchmark_scenario(
    spark: SparkSession,
    name: str,
    *,
    n_entities: int = 150,
    seed: int = 0,
    sizes: SplitSizes | None = None,
) -> Scenario:
    """Table-7 single-domain scenario: train/support/test from one pool.

    No C1-C3 here — both "sources" render records the same way, and
    train and test share the (single) domain.
    """
    records = bench.benchmark_records(spark, name, n_entities=n_entities, seed=seed).cache()
    cands = candidate_pairs(records, "name", seed=seed, keep_per_million=200_000)
    wide = assemble_pairs(cands, records, bench.ATTRS).cache()
    sz = sizes or BENCH_SIZES
    # Cap the requested sizes at a 50/35/15 split of the available pool
    # so tiny corpora still yield non-empty train/test/support.
    counts = {r["label"]: r["n"] for r in wide.groupBy("label").agg(
        F.count("*").alias("n")).collect()}
    n_pos, n_neg = int(counts.get(1.0, 0)), int(counts.get(0.0, 0))
    sz = SplitSizes(
        train_pos=min(sz.train_pos, n_pos // 2),
        train_neg=min(sz.train_neg, n_neg // 2),
        support_pos=min(sz.support_pos, max(1, n_pos * 15 // 100)),
        support_neg=min(sz.support_neg, max(1, n_neg * 15 // 100)),
        test_pos=min(sz.test_pos, n_pos * 35 // 100),
        test_neg=min(sz.test_neg, n_neg * 35 // 100),
    )
    train = sample_split(wide, sz.train_pos, sz.train_neg, seed)
    test = sample_split(wide, sz.test_pos, sz.test_neg, seed + 1, exclude=train)
    both = train.select("pair_id").unionByName(test.select("pair_id"))
    support = sample_split(wide, sz.support_pos, sz.support_neg, seed + 2, exclude=both)
    return Scenario(
        attrs=bench.ATTRS,
        train=materialize(train),
        support=materialize(support),
        test=materialize(test),
    )
