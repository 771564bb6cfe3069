"""Structural tests for the Music / Monitor / benchmark corpora."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.datagen import benchmark as bench
from repro.datagen import monitor as mon
from repro.datagen import music as mus
from repro.oracle import assert_equivalent

# ------------------------------------------------------------------ music

def test_music_attrs_count_matches_table2():
    assert len(mus.ATTRS) == 9  # |A| = 9 (Table 2)


def test_music_sources_and_domain():
    assert len(mus.SOURCES) == 7
    assert len(mus.SOURCE_DOMAIN) == 3
    assert set(mus.SOURCE_DOMAIN) <= set(mus.SOURCES)


def test_music_entities_three_types():
    ents = mus.music_entities(30, seed=0)
    types = {e["entity_type"] for e in ents}
    assert types == {"artist", "album", "track"}


def test_music_entity_ids_globally_unique():
    ents = mus.music_entities(50, seed=0)
    ids = [e["entity_id"] for e in ents]
    assert len(ids) == len(set(ids))


def test_artist_families_share_name_not_native():
    ents = [e for e in mus.music_entities(60, seed=0) if e["entity_type"] == "artist"]
    by_name = {}
    for e in ents:
        by_name.setdefault(tuple(e["name"]), []).append(e)
    fams = [v for v in by_name.values() if len(v) > 1]
    assert fams, "expected homonym families"
    for fam in fams:
        natives = {tuple(e["name_native_language"]) for e in fam}
        assert len(natives) == len(fam)  # native transliteration unique
        assert len({tuple(e["genre"]) for e in fam}) == 1  # weak attrs shared


def test_track_versions_share_all_but_version():
    ents = [e for e in mus.music_entities(60, seed=0) if e["entity_type"] == "track"]
    by_key = {}
    for e in ents:
        by_key.setdefault((tuple(e["name"]), tuple(e["main_performer"])), []).append(e)
    fams = [v for v in by_key.values() if len(v) > 1]
    assert fams, "expected multi-version tracks"
    for fam in fams:
        assert len({tuple(e["version"]) for e in fam}) == len(fam)
        assert len({tuple(e["label"]) for e in fam}) == 1


def test_music_profiles_abbreviate_target_only():
    for p in mus.music_profiles():
        if p.name in mus.SOURCE_DOMAIN:
            assert "main_performer" not in p.abbrev
        else:
            assert p.abbrev["main_performer"] > 0.5


def test_music_records_df(music_records_tiny):
    assert set(mus.ATTRS) <= set(music_records_tiny.columns)
    n_sources = music_records_tiny.select("source").distinct().count()
    assert n_sources == 7


def test_music_records_count_oracle(spark, music_records_tiny):
    got = (
        music_records_tiny.groupBy("entity_type")
        .agg(F.count("*").alias("n"))
    )
    assert_equivalent(
        got,
        "SELECT entity_type, count(*) AS n FROM recs GROUP BY entity_type",
        recs=music_records_tiny,
    )


def test_music_c3_performer_abbreviated_in_target(music_records_tiny):
    """Target sites mostly render 1-char performer tokens (initials)."""
    pdf = music_records_tiny.select("source", "main_performer").toPandas()
    def frac_abbrev(rows):
        vals = [v for v in rows if v]
        short = [v for v in vals if all(len(t) == 1 for t in v.split())]
        return len(short) / max(1, len(vals))
    src = frac_abbrev(pdf[pdf.source.isin(mus.SOURCE_DOMAIN)].main_performer)
    tgt = frac_abbrev(pdf[~pdf.source.isin(mus.SOURCE_DOMAIN)].main_performer)
    assert tgt > 0.5 > src


def test_music_c2_native_rarely_in_source(music_records_tiny):
    pdf = music_records_tiny.select("source", "name_native_language").toPandas()
    src = (pdf[pdf.source.isin(mus.SOURCE_DOMAIN)].name_native_language != "").mean()
    tgt = (pdf[~pdf.source.isin(mus.SOURCE_DOMAIN)].name_native_language != "").mean()
    assert tgt > src + 0.2


# ---------------------------------------------------------------- monitor

def test_monitor_attrs_count_matches_table2():
    assert len(mon.ATTRS) == 13


def test_monitor_sources_24_and_domain_5():
    assert len(mon.SOURCES) == 24
    assert len(mon.SOURCE_DOMAIN) == 5
    assert mon.SOURCE_DOMAIN[0] == "ebay.com"


def test_monitor_target_only_attrs_are_5():
    assert len(mon.TARGET_ONLY_ATTRS) == 5
    assert mon.TARGET_ONLY_ATTRS <= set(mon.ATTRS)


def test_monitor_c2_attrs_empty_in_source_domain(spark, monitor_records_tiny):
    """The 5 target-only attributes are blank in every source-domain
    record (App. A.2 / Fig. 11) — checked via the DuckDB oracle."""
    conds = [F.col(a) != "" for a in sorted(mon.TARGET_ONLY_ATTRS)]
    nonblank = monitor_records_tiny.where(
        F.col("source").isin(mon.SOURCE_DOMAIN)
    ).where(conds[0] | conds[1] | conds[2] | conds[3] | conds[4])
    assert nonblank.count() == 0
    # oracle cross-check on one representative attribute
    got = (
        monitor_records_tiny.groupBy("source")
        .agg(F.sum((F.col("condition") != "").cast("long")).alias("n_nonblank"))
    )
    assert_equivalent(
        got,
        "SELECT source, sum(CASE WHEN condition <> '' THEN 1 ELSE 0 END)"
        " AS n_nonblank FROM recs GROUP BY source",
        recs=monitor_records_tiny,
    )


def test_monitor_prodtype_synonym_shift(monitor_records_tiny):
    """C3: 'monitor' token appears in source prod_type, 'display' in target."""
    pdf = monitor_records_tiny.select("source", "prod_type").toPandas()
    src_text = " ".join(pdf[pdf.source.isin(mon.SOURCE_DOMAIN)].prod_type)
    tgt_text = " ".join(pdf[~pdf.source.isin(mon.SOURCE_DOMAIN)].prod_type)
    assert "monitor" in src_text and "display" not in src_text
    assert "display" in tgt_text


def test_monitor_families_share_brand_model():
    ents = mon.monitor_entities(40, seed=0)
    by_model = {}
    for e in ents:
        by_model.setdefault(tuple(e["model_code"]), []).append(e)
    fams = [v for v in by_model.values() if len(v) > 1]
    assert fams
    for fam in fams:
        assert len({tuple(e["brand"]) for e in fam}) == 1
        sizes = {tuple(e["screen_size"]) for e in fam}
        assert len(sizes) > 1  # variants differ in size


def test_monitor_page_title_contains_brand_model(monitor_records_tiny):
    row = monitor_records_tiny.where(F.col("page_title") != "").first()
    toks = row["page_title"].split()
    assert len(toks) >= 2


# -------------------------------------------------------------- benchmark

def test_benchmark_registry_has_11_datasets():
    assert len(bench.BENCHMARKS) == 11
    kinds = {c.kind for c in bench.BENCHMARKS.values()}
    assert kinds == {"Structured", "Dirty"}
    assert sum(c.kind == "Dirty" for c in bench.BENCHMARKS.values()) == 4


@pytest.mark.parametrize("name", sorted(bench.BENCHMARKS))
def test_benchmark_records_build(spark, name):
    df = bench.benchmark_records(spark, name, n_entities=12, seed=0)
    assert set(bench.ATTRS) <= set(df.columns)
    assert df.select("source").distinct().count() == 2
    # every entity present in both sources (single-domain, clean overlap)
    assert df.count() == 2 * df.select("entity_id").distinct().count()


def test_dirty_variant_moves_values(spark):
    clean = bench.benchmark_records(spark, "DBLP-ACM", n_entities=30, seed=0)
    dirty = bench.benchmark_records(spark, "Dirty-DBLP-ACM", n_entities=30, seed=0)
    blank = lambda df: df.where(F.col("name") == "").count() / df.count()
    assert blank(dirty) > blank(clean)


def test_benchmark_difficulty_ordering():
    assert bench.BENCHMARKS["Fodors-Zagats"].noise < bench.BENCHMARKS["Amazon-Google"].noise
    assert (
        bench.BENCHMARKS["Dirty-Walmart-Amazon"].dirty_p
        > bench.BENCHMARKS["Walmart-Amazon"].dirty_p
    )
