"""Smoke + schema tests for the per-table harnesses (tiny scale).

Each table function must run end-to-end and produce rows with the
paper's column layout; heavier statistical assertions live in the
benchmarks and EXPERIMENTS.md.
"""
import pytest

from repro.core.train import TrainConfig
from repro.experiments import tables
from repro.pairs.splits import SplitSizes

TINY = dict(
    n_per_type=100,
    sizes=SplitSizes(train_pos=40, train_neg=80, support_pos=20, support_neg=20,
                     test_pos=40, test_neg=80),
)
FAST = TrainConfig(epochs=20, batch_size=64, seed=0)


def test_format_rows():
    out = tables.format_rows([{"a": 1, "bb": "x"}, {"a": 22, "bb": "yyy"}], "T")
    lines = out.strip().split("\n")
    assert lines[0] == "== T"
    assert "bb" in lines[1] and "22" in lines[3]


def test_format_rows_empty():
    assert "(no rows)" in tables.format_rows([], "T")


def test_table2_rows(spark):
    rows = tables.table2_rows(spark, music_n=40, music1m_n=60, monitor_n=40)
    assert [r["Data"] for r in rows] == ["Monitor", "Music-3K", "Music-1M"]
    for r in rows:
        assert r["#Records"] > 0
    music = rows[1]
    assert music["|D_S*|"] == 3 and music["|D_T*|"] == 7 and music["|A|"] == 9
    monitor = rows[0]
    assert monitor["|D_S*|"] == 5 and monitor["|D_T*|"] == 24 and monitor["|A|"] == 13
    assert "Track" in music["Entity_types"]
    assert "Track" not in rows[2]["Entity_types"]  # Music-1M: artist+album


def test_table9_rows_tiny(spark):
    rows = tables.table9_rows(
        spark, methods=["TLER", "AdaMEL-base"], datasets=("Music-3K",),
        train_cfg=FAST, **TINY,
    )
    # 2 methods × 2 scenarios × 3 types
    assert len(rows) == 12
    assert {r["Scenario"] for r in rows} == {"overlap", "disjoint"}
    assert {r["Type"] for r in rows} == {"artist", "album", "track"}
    assert all(0.0 <= r["_mean"] <= 1.0 for r in rows)


def test_table4_rows_tiny(spark):
    rows = tables.table4_rows(spark, train_cfg=FAST, top_k=3, **TINY)
    assert len(rows) == 6  # 2 datasets × top-3
    for r in rows:
        assert r["Feature"].lower().endswith(("_shared", "_unique"))
        assert 0.0 < r["Score"] <= 1.0
    # scores are reported in descending order per dataset
    music = [r["Score"] for r in rows if r["Data"].startswith("Music")]
    assert music == sorted(music, reverse=True)


def test_table6_rows_tiny(spark):
    rows = tables.table6_rows(spark, train_cfg=FAST, types=("artist",), **TINY)
    assert len(rows) == 2  # base + hyb
    for r in rows:
        assert {"Shared", "Unique", "Both"} <= set(r)


def test_table7_rows_tiny(spark):
    rows = tables.table7_rows(
        spark, datasets=("Fodors-Zagats",), n_entities=60, train_cfg=FAST,
    )
    assert len(rows) == 1
    r = rows[0]
    assert r["Dataset"] == "Fodors-Zagats" and r["Type"] == "Structured"
    for m in ("DeepMatcher", "AdaMEL-zero", "AdaMEL-hyb"):
        assert 0.0 <= r[m] <= 100.0


def test_fig8_rows_tiny(spark):
    rows = tables.fig8_rows(
        spark, lambdas=(0.0, 0.98), types=("artist",), base_cfg=FAST, **TINY,
    )
    assert len(rows) == 4  # 2 variants × 2 lambdas
    assert {r["lambda"] for r in rows} == {0.0, 0.98}


def test_top_attrs_are_valid():
    from repro.datagen.monitor import ATTRS as MON_ATTRS
    from repro.datagen.music import ATTRS as MUS_ATTRS

    for name, attrs in tables.TOP_ATTRS.items():
        universe = MON_ATTRS if name == "Monitor" else MUS_ATTRS
        assert set(attrs) <= set(universe), name
