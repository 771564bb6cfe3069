"""Benchmarks for Table 2 (data statistics) and Table 3 (split sizes).

These time the corpus generators + the Spark aggregation/split pipeline
at bench scale and assert the structural facts the paper's tables state.
"""
from repro.experiments.tables import table2_rows, table3_rows


def test_bench_table2(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: table2_rows(spark), rounds=1, iterations=1
    )
    by_name = {r["Data"]: r for r in rows}
    assert by_name["Music-3K"]["|A|"] == 9 and by_name["Music-3K"]["|D_T*|"] == 7
    assert by_name["Monitor"]["|A|"] == 13 and by_name["Monitor"]["|D_T*|"] == 24
    assert by_name["Music-1M"]["#Records"] > by_name["Music-3K"]["#Records"]


def test_bench_table3(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: table3_rows(spark), rounds=1, iterations=1
    )
    assert len(rows) == 6  # 3 Music-3K types + 2 Music-1M types + Monitor
    for r in rows:
        assert r["Train |D_S|"] > 0 and r["Test |D_T|"] > 0
        assert r["Support |S_U|"] <= 100
    m1m = [r for r in rows if r["Data"] == "Music-1M"]
    m3k = [r for r in rows if r["Data"] == "Music-3K"]
    assert min(r["Train |D_S|"] for r in m1m) > max(r["Train |D_S|"] for r in m3k)
