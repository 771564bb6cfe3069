"""Oracle-checked tests for blocking, assembly and splits (Catalyst)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.datagen.music import ATTRS, SOURCE_DOMAIN
from repro.oracle import assert_equivalent
from repro.pairs.assemble import align_ontology, assemble_pairs, weaken_labels
from repro.pairs.blocking import block_pairs, random_pairs, tokens_col
from repro.pairs.splits import SplitSizes, make_scenario, sample_split, with_pool


@pytest.fixture(scope="module")
def small_records(spark):
    pdf = pd.DataFrame(
        {
            "record_id": ["s1:1:0", "s2:1:0", "s1:2:0", "s2:2:0", "s2:3:0", "s1:3:0"],
            "source": ["s1", "s2", "s1", "s2", "s2", "s1"],
            "entity_id": [1, 1, 2, 2, 3, 3],
            "entity_type": ["t", "t", "t", "t", "t", "t"],
            "name": [
                "hey jude", "hey jude", "let it be", "let it rain",
                "yesterday", "yesterday once",
            ],
            "artist": ["beatles", "p m", "beatles", "storm", "beatles", "beatles"],
        }
    )
    return spark.createDataFrame(pdf).cache()


# ---------------------------------------------------------------- blocking

def test_tokens_col_matches_python_tokenizer(spark, small_records):
    from repro.text.tokenize import tokenize

    rows = small_records.select("name", tokens_col("name").alias("toks")).collect()
    for r in rows:
        assert list(r["toks"]) == tokenize(r["name"])


def test_block_pairs_oracle(spark, small_records):
    """Catalyst token self-join == equivalent DuckDB SQL."""
    got = block_pairs(small_records, "name", max_df=100)
    sql = """
        WITH toks AS (
          SELECT DISTINCT record_id, source, tok
          FROM (SELECT record_id, source,
                       unnest(string_split_regex(lower(name), '[^0-9a-z]+')) AS tok
                FROM recs)
          WHERE tok <> ''
        )
        SELECT DISTINCT a.record_id AS id_a, b.record_id AS id_b
        FROM toks a JOIN toks b
          ON a.tok = b.tok AND a.record_id < b.record_id
         AND a.source <> b.source
    """
    assert_equivalent(got, sql, recs=small_records)


def test_block_pairs_cross_source_only(spark, small_records):
    pairs = block_pairs(small_records, "name").collect()
    srcs = {r["id_a"].split(":")[0] + r["id_b"].split(":")[0] for r in pairs}
    assert "s1s1" not in srcs and "s2s2" not in srcs


def test_block_pairs_finds_matching_entities(spark, small_records):
    pairs = {(r["id_a"], r["id_b"]) for r in block_pairs(small_records, "name").collect()}
    assert ("s1:1:0", "s2:1:0") in pairs  # "hey jude" == "hey jude"
    assert ("s1:3:0", "s2:3:0") in pairs  # share "yesterday"


def test_block_pairs_stop_token_guard(spark, small_records):
    # max_df=1 drops every token that appears in >1 record -> no pairs
    assert block_pairs(small_records, "name", max_df=1).count() == 0


def test_block_pairs_id_ordering(spark, small_records):
    for r in block_pairs(small_records, "name").collect():
        assert r["id_a"] < r["id_b"]


def test_random_pairs_deterministic(spark, small_records):
    a = sorted(map(str, random_pairs(small_records, seed=5, keep_per_million=10**6).collect()))
    b = sorted(map(str, random_pairs(small_records, seed=5, keep_per_million=10**6).collect()))
    assert a == b


def test_random_pairs_cross_source_and_ordered(spark, small_records):
    for r in random_pairs(small_records, n_buckets=1, keep_per_million=10**6).collect():
        assert r["id_a"] < r["id_b"]
        assert r["id_a"].split(":")[0] != r["id_b"].split(":")[0]


def test_random_pairs_keep_rate_bounds(spark, music_records_tiny):
    all_p = random_pairs(music_records_tiny, n_buckets=4, keep_per_million=10**6, seed=0).count()
    half = random_pairs(music_records_tiny, n_buckets=4, keep_per_million=500_000, seed=0).count()
    assert 0 < half < all_p


# ---------------------------------------------------------------- assembly

def test_align_ontology_adds_missing_columns(spark, small_records):
    out = align_ontology(small_records, ["name", "artist", "gender"])
    assert "gender" in out.columns
    assert out.where(F.col("gender") != "").count() == 0


def test_assemble_pairs_label_oracle(spark, small_records):
    pairs = block_pairs(small_records, "name")
    wide = assemble_pairs(pairs, small_records, ["name", "artist"])
    got = wide.select("pair_id", "label")
    sql = """
        SELECT a.record_id || '|' || b.record_id AS pair_id,
               CASE WHEN a.entity_id = b.entity_id THEN 1.0 ELSE 0.0 END AS label
        FROM pairs p
        JOIN recs a ON p.id_a = a.record_id
        JOIN recs b ON p.id_b = b.record_id
    """
    assert_equivalent(got, sql, pairs=pairs, recs=small_records)


def test_assemble_pairs_columns(spark, small_records):
    pairs = block_pairs(small_records, "name")
    wide = assemble_pairs(pairs, small_records, ["name", "artist"])
    assert {"pair_id", "label", "source_a", "source_b", "a_name", "b_artist"} <= set(
        wide.columns
    )


def test_assemble_pairs_values_joined_correctly(spark, small_records):
    pairs = block_pairs(small_records, "name")
    wide = assemble_pairs(pairs, small_records, ["name"])
    row = wide.where(F.col("pair_id") == "s1:1:0|s2:1:0").first()
    assert row["a_name"] == "hey jude" and row["b_name"] == "hey jude"
    assert row["label"] == 1.0


def test_weaken_labels_flip_rate(spark, music_wide_tiny):
    weak = weaken_labels(music_wide_tiny, flip_p=0.3, seed=1)
    joined = (
        music_wide_tiny.select("pair_id", F.col("label").alias("clean"))
        .join(weak.select("pair_id", F.col("label").alias("dirty")), "pair_id")
    )
    n = joined.count()
    flipped = joined.where(F.col("clean") != F.col("dirty")).count()
    assert 0.2 < flipped / n < 0.4


def test_weaken_labels_deterministic(spark, music_wide_tiny):
    a = weaken_labels(music_wide_tiny, 0.2, seed=3).select("pair_id", "label")
    b = weaken_labels(music_wide_tiny, 0.2, seed=3).select("pair_id", "label")
    assert sorted(map(str, a.collect())) == sorted(map(str, b.collect()))


def test_weaken_labels_zero_noop(spark, music_wide_tiny):
    w = weaken_labels(music_wide_tiny, 0.0, seed=1)
    diff = (
        music_wide_tiny.select("pair_id", F.col("label").alias("l1"))
        .join(w.select("pair_id", F.col("label").alias("l2")), "pair_id")
        .where(F.col("l1") != F.col("l2"))
    )
    assert diff.count() == 0


# ------------------------------------------------------------------ splits

def test_with_pool_oracle(spark, music_wide_tiny):
    got = with_pool(music_wide_tiny, SOURCE_DOMAIN).groupBy("pool").agg(
        F.count("*").alias("n")
    )
    domain = "', '".join(SOURCE_DOMAIN)
    sql = f"""
        SELECT CASE (source_a IN ('{domain}'))::int + (source_b IN ('{domain}'))::int
               WHEN 2 THEN 'source' WHEN 1 THEN 'mixed' ELSE 'disjoint' END AS pool,
               count(*) AS n
        FROM wide GROUP BY 1
    """
    assert_equivalent(got, sql, wide=music_wide_tiny)


def test_sample_split_sizes(spark, music_wide_tiny):
    s = sample_split(music_wide_tiny, 10, 20, seed=0)
    pdf = s.groupBy("label").count().toPandas().set_index("label")["count"]
    assert pdf.get(1.0, 0) == 10 and pdf.get(0.0, 0) == 20


def test_sample_split_deterministic(spark, music_wide_tiny):
    a = sorted(r["pair_id"] for r in sample_split(music_wide_tiny, 5, 5, 1).collect())
    b = sorted(r["pair_id"] for r in sample_split(music_wide_tiny, 5, 5, 1).collect())
    assert a == b


def test_sample_split_seed_changes_sample(spark, music_wide_tiny):
    a = sorted(r["pair_id"] for r in sample_split(music_wide_tiny, 20, 20, 1).collect())
    b = sorted(r["pair_id"] for r in sample_split(music_wide_tiny, 20, 20, 2).collect())
    assert a != b


def test_sample_split_exclusion(spark, music_wide_tiny):
    a = sample_split(music_wide_tiny, 10, 10, seed=0)
    b = sample_split(music_wide_tiny, 10, 10, seed=5, exclude=a)
    overlap = a.select("pair_id").join(b.select("pair_id"), "pair_id")
    assert overlap.count() == 0


def test_make_scenario_pools_respected(spark, music_wide_tiny):
    sizes = SplitSizes(train_pos=5, train_neg=5, support_pos=3, support_neg=3,
                       test_pos=5, test_neg=5)
    parts = make_scenario(music_wide_tiny, SOURCE_DOMAIN, "disjoint", sizes, seed=0)
    for r in parts["train"].collect():
        assert r["source_a"] in SOURCE_DOMAIN and r["source_b"] in SOURCE_DOMAIN
    for r in parts["test"].collect():
        assert r["source_a"] not in SOURCE_DOMAIN
        assert r["source_b"] not in SOURCE_DOMAIN


def test_make_scenario_overlap_test_has_target_record(spark, music_wide_tiny):
    sizes = SplitSizes(train_pos=5, train_neg=5, support_pos=3, support_neg=3,
                       test_pos=5, test_neg=5)
    parts = make_scenario(music_wide_tiny, SOURCE_DOMAIN, "overlap", sizes, seed=0)
    for r in parts["test"].collect():
        assert (r["source_a"] not in SOURCE_DOMAIN) or (r["source_b"] not in SOURCE_DOMAIN)


def test_make_scenario_support_disjoint_from_test(spark, music_wide_tiny):
    sizes = SplitSizes(train_pos=5, train_neg=5, support_pos=5, support_neg=5,
                       test_pos=10, test_neg=10)
    parts = make_scenario(music_wide_tiny, SOURCE_DOMAIN, "overlap", sizes, seed=0)
    inter = parts["support"].select("pair_id").join(
        parts["test"].select("pair_id"), "pair_id"
    )
    assert inter.count() == 0


def test_make_scenario_rejects_unknown(spark, music_wide_tiny):
    with pytest.raises(ValueError):
        make_scenario(music_wide_tiny, SOURCE_DOMAIN, "sideways", SplitSizes(1, 1))
