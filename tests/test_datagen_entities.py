"""Unit tests for the entity/corruption engine."""
import numpy as np
import pytest

from repro.datagen.entities import (
    SourceProfile,
    corrupt_value,
    initials,
    person_name,
    records_df,
    render_record,
    vocab,
    word,
)
from repro.oracle import assert_equivalent


def rng():
    return np.random.default_rng(0)


def test_initials():
    assert initials(["paul", "mccartney"]) == ["p", "m"]
    assert initials([]) == []


def test_corrupt_value_plain_join():
    prof = SourceProfile(name="s")
    assert corrupt_value(["a", "b"], "x", prof, rng()) == "a b"


def test_corrupt_value_empty_tokens():
    prof = SourceProfile(name="s")
    assert corrupt_value([], "x", prof, rng()) == ""


def test_corrupt_value_dropped_attr():
    prof = SourceProfile(name="s", drop=frozenset({"x"}))
    assert corrupt_value(["a"], "x", prof, rng()) == ""


def test_corrupt_value_always_missing():
    prof = SourceProfile(name="s", missing={"x": 1.0})
    assert corrupt_value(["a"], "x", prof, rng()) == ""


def test_corrupt_value_never_missing():
    prof = SourceProfile(name="s", missing={"x": 0.0})
    assert corrupt_value(["a"], "x", prof, rng()) == "a"


def test_corrupt_value_abbreviation():
    prof = SourceProfile(name="s", abbrev={"x": 1.0})
    assert corrupt_value(["paul", "mccartney"], "x", prof, rng()) == "p m"


def test_corrupt_value_synonym_rewrite():
    prof = SourceProfile(name="s", synonym={"x": {"monitor": "display"}})
    assert corrupt_value(["led", "monitor"], "x", prof, rng()) == "led display"


def test_corrupt_value_synonym_other_attr_untouched():
    prof = SourceProfile(name="s", synonym={"y": {"led": "zzz"}})
    assert corrupt_value(["led"], "x", prof, rng()) == "led"


def test_corrupt_value_token_drop_keeps_at_least_one():
    prof = SourceProfile(name="s", token_drop={"x": 1.0})
    out = corrupt_value(["a", "b", "c"], "x", prof, rng())
    assert len(out.split()) == 1


def test_corrupt_value_noise_replaces_tokens():
    prof = SourceProfile(name="s", noise=1.0)
    out = corrupt_value(["a", "b"], "x", prof, rng())
    assert all(t.startswith("zz") for t in out.split())


def test_render_record_has_all_attrs_and_source():
    ent = {"entity_id": 7, "entity_type": "t", "a1": ["v"], "a2": []}
    prof = SourceProfile(name="siteX")
    row = render_record(ent, ["a1", "a2", "source"], prof, rng())
    assert row["record_id"].startswith("siteX:7:")
    assert row["entity_id"] == 7
    assert row["a1"] == "v" and row["a2"] == ""
    assert row["source"] == "siteX"


def test_records_df_schema_and_counts(spark):
    ents = [
        {"entity_id": i, "entity_type": "t", "a1": [word(rng())]} for i in range(20)
    ]
    profs = [SourceProfile(name=f"s{i}") for i in range(3)]
    df = records_df(spark, ents, ["a1", "source"], profs, presence=0.5, seed=1)
    assert set(df.columns) >= {"record_id", "source", "entity_id", "entity_type", "a1"}
    # every entity appears at least once
    assert df.select("entity_id").distinct().count() == 20


def test_records_df_deterministic(spark):
    ents = [{"entity_id": i, "entity_type": "t", "a1": ["v"]} for i in range(10)]
    profs = [SourceProfile(name="s1"), SourceProfile(name="s2")]
    a = records_df(spark, ents, ["a1", "source"], profs, seed=3).collect()
    b = records_df(spark, ents, ["a1", "source"], profs, seed=3).collect()
    assert sorted(map(str, a)) == sorted(map(str, b))


def test_records_df_counts_oracle(spark):
    """Per-source record counts agree with DuckDB over the same frame."""
    ents = [{"entity_id": i, "entity_type": "t", "a1": ["v"]} for i in range(15)]
    profs = [SourceProfile(name="s1"), SourceProfile(name="s2")]
    df = records_df(spark, ents, ["a1", "source"], profs, presence=0.7, seed=2)
    got = df.groupBy("source").count().withColumnRenamed("count", "n")
    assert_equivalent(
        got, "SELECT source, count(*) AS n FROM recs GROUP BY source", recs=df
    )


def test_word_is_pronounceable_and_deterministic():
    g1, g2 = np.random.default_rng(5), np.random.default_rng(5)
    assert word(g1) == word(g2)
    assert word(np.random.default_rng(1), syllables=3).isalpha()


def test_vocab_distinct():
    v = vocab(np.random.default_rng(0), 50)
    assert len(v) == len(set(v)) == 50


def test_person_name_two_tokens():
    assert len(person_name(np.random.default_rng(0))) == 2
