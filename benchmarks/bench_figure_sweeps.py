"""Benchmarks for the tabular figure sweeps: Fig. 8 (λ), Fig. 9
(incremental sources + runtime), Fig. 10 (|S_U|)."""
from repro.experiments.tables import fig8_rows, fig10_rows, figure9_rows


def test_bench_fig8_lambda(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: fig8_rows(spark, lambdas=(0.0, 0.5, 0.98, 1.0), types=("artist",)),
        rounds=1,
        iterations=1,
    )
    get = lambda v, lam: next(
        r["PRAUC"] for r in rows if r["Method"] == v and r["lambda"] == lam
    )
    # paper Fig. 8: performance at λ=0.98 beats λ=1 (no supervision)
    assert get("AdaMEL-zero", 0.98) > get("AdaMEL-zero", 1.0)
    assert get("AdaMEL-hyb", 0.98) >= get("AdaMEL-hyb", 1.0) - 0.02


def test_bench_fig10_support_size(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: fig10_rows(spark, support_sizes=(1, 20, 100, 300)),
        rounds=1,
        iterations=1,
    )
    few = {r["|S_U|"]: r["PRAUC"] for r in rows if r["Method"] == "AdaMEL-few"}
    # paper Fig. 10: more labeled support helps initially
    assert max(few[100], few[300]) >= few[1] - 0.02


def test_bench_figure9_sources(benchmark, spark):
    rows = benchmark.pedantic(
        lambda: figure9_rows(spark, steps=(7, 15, 24)), rounds=1, iterations=1
    )
    rt = {r["Method"]: r["PRAUC"] for r in rows if r["|D_T*|"] == "runtime_s"}
    # runtimes are recorded per method (the paper's absolute runtime
    # ordering does not transfer to our numpy-lite baselines — see
    # EXPERIMENTS.md; the parameter-count comparison does and is
    # asserted in tests/test_core_model.py / EXPERIMENTS.md)
    assert all(v > 0 for v in rt.values()) and len(rt) == 3
    perf = [r for r in rows if r["|D_T*|"] != "runtime_s"]
    hyb = [r["PRAUC"] for r in perf if r["Method"] == "AdaMEL-hyb"]
    # stability: AdaMEL-hyb stays in a bounded band as sources grow
    assert max(hyb) - min(hyb) < 0.35
