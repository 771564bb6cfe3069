"""Benchmarks for Table 6 (contrastive ablation) and Table 7 (single domain).

Table 6's claim: using shared & unique contrastive features together
beats either alone. Table 7's claim (regime flip): on clean
single-domain data DeepMatcher is competitive — AdaMEL-zero does *not*
dominate it there — while AdaMEL-hyb stays comparable; and Dirty
variants are harder than their Structured counterparts.
"""
from repro.experiments.tables import table6_rows, table7_rows

T7_DATASETS = (
    "Fodors-Zagats",
    "DBLP-ACM",
    "Amazon-Google",
    "Walmart-Amazon",
    "Dirty-DBLP-ACM",
    "Dirty-Walmart-Amazon",
)


def test_bench_table6_ablation(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: table6_rows(spark), rounds=1, iterations=1
    )
    assert len(rows) == 4  # {artist, album} × {base, hyb}
    for r in rows:
        assert r["Both"] >= max(r["Shared"], r["Unique"]) - 0.05, r


def test_bench_table7_single_domain(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: table7_rows(spark, datasets=T7_DATASETS), rounds=1, iterations=1
    )
    by_name = {r["Dataset"]: r for r in rows}
    # easy datasets produce high F1 for every method
    assert by_name["Fodors-Zagats"]["DeepMatcher"] > 80
    assert by_name["DBLP-ACM"]["AdaMEL-hyb"] > 80
    # dirty variants are at most as easy as their structured originals
    assert (
        by_name["Dirty-Walmart-Amazon"]["DeepMatcher"]
        <= by_name["Walmart-Amazon"]["DeepMatcher"] + 8
    )
    # regime flip: clean single-domain data does not favor AdaMEL-zero
    wins_dm = sum(
        by_name[d]["DeepMatcher"] >= by_name[d]["AdaMEL-zero"] - 3 for d in T7_DATASETS
    )
    assert wins_dm >= 4
