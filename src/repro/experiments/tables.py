"""Row producers for every table in the paper's evaluation section.

Each ``tableN_rows(spark, …)`` returns a list of dicts matching the
paper's table layout; ``format_rows`` renders them for job output.
``EXPERIMENTS.md`` records the paper's numbers next to the measured
ones. Scale knobs default to the bench scale (DESIGN.md §6); tests call
these with smaller sizes.
"""
from __future__ import annotations

import time

import numpy as np
from pyspark.sql import SparkSession
from pyspark.sql import functions as Fn

from ..core.train import TrainConfig
from ..datagen import benchmark as bench
from ..datagen import monitor as mon
from ..datagen import music as mus
from ..metrics import f1_at, pr_auc
from ..pairs.splits import SplitSizes, sample_split, with_pool
from .harness import ALL_METHODS, Scenario, evaluate_methods, run_adamel, run_method
from .scenarios import (
    MONITOR_SIZES,
    benchmark_scenario,
    materialize,
    monitor_scenario,
    music_scenario,
)

MUSIC_TYPES = ("artist", "album", "track")
MUSIC_1M_TYPES = ("artist", "album")  # Table 2/9: Music-1M has no tracks
SCENARIOS = ("overlap", "disjoint")


def format_rows(rows: list[dict], title: str = "") -> str:
    """Plain-text table: header from dict keys, aligned columns."""
    if not rows:
        return f"== {title}\n(no rows)\n"
    cols = list(rows[0].keys())
    widths = {c: max(len(str(c)), *(len(str(r.get(c, ""))) for r in rows)) for c in cols}
    lines = [f"== {title}"] if title else []
    lines.append("  ".join(str(c).ljust(widths[c]) for c in cols))
    for r in rows:
        lines.append("  ".join(str(r.get(c, "")).ljust(widths[c]) for c in cols))
    return "\n".join(lines) + "\n"


def _fmt(mean: float, std: float) -> str:
    return f"{mean:.4f} ± {std:.4f}"


# ------------------------------------------------------------------ Table 2

def table2_rows(spark: SparkSession, *, music_n: int = 260, music1m_n: int = 600,
                monitor_n: int = 300, seed: int = 0) -> list[dict]:
    """Data statistics (paper Table 2), computed with Spark aggregates."""
    rows = []
    specs = [
        ("Monitor", mon.monitor_records(spark, n_entities=monitor_n, seed=seed),
         len(mon.SOURCE_DOMAIN), len(mon.SOURCES), len(mon.ATTRS), None),
        ("Music-3K", mus.music_records(spark, n_per_type=music_n, seed=seed),
         len(mus.SOURCE_DOMAIN), len(mus.SOURCES), len(mus.ATTRS), None),
        ("Music-1M", mus.music_records(spark, n_per_type=music1m_n, seed=seed),
         len(mus.SOURCE_DOMAIN), len(mus.SOURCES), len(mus.ATTRS), list(MUSIC_1M_TYPES)),
    ]
    for name, records, n_src, n_tgt, n_attrs, type_filter in specs:
        if type_filter:
            records = records.where(Fn.col("entity_type").isin(type_filter))
        n = records.count()
        types = [
            r["entity_type"]
            for r in records.select("entity_type").distinct().orderBy("entity_type").collect()
        ]
        rows.append(
            {
                "Data": name,
                "#Records": n,
                "Entity_types": ", ".join(t.capitalize() for t in types),
                "|D_S*|": n_src,
                "|D_T*|": n_tgt,
                "|A|": n_attrs,
            }
        )
    return rows


# ------------------------------------------------------------------ Table 3

def table3_rows(spark: SparkSession, *, seed: int = 0, **scale) -> list[dict]:
    """Train/support/test sizes actually materialized per scenario."""
    rows = []
    for data, types, weak in (
        ("Music-3K", MUSIC_TYPES, False),
        ("Music-1M", MUSIC_1M_TYPES, True),
    ):
        for t in types:
            sc = music_scenario(spark, t, "overlap", weak=weak, seed=seed, **scale)
            rows.append(
                {
                    "Data": data,
                    "Entity_type": t.capitalize(),
                    "Train |D_S|": sc.train.count(),
                    "Support |S_U|": sc.support.count(),
                    "Test |D_T|": sc.test.count(),
                }
            )
    sc = monitor_scenario(spark, "overlap", seed=seed)
    rows.append(
        {
            "Data": "Monitor",
            "Entity_type": "Monitor",
            "Train |D_S|": sc.train.count(),
            "Support |S_U|": sc.support.count(),
            "Test |D_T|": sc.test.count(),
        }
    )
    return rows


# ------------------------------------------- Tables 8 & 9 (Fig. 6 numbers)

def table9_rows(
    spark: SparkSession,
    *,
    methods: list[str] | None = None,
    n_seeds: int = 1,
    datasets: tuple[str, ...] = ("Music-3K", "Music-1M"),
    seed: int = 0,
    train_cfg: TrainConfig | None = None,
    **scale,
) -> list[dict]:
    """Music MEL PRAUC: methods × entity types × scenarios (Table 9)."""
    methods = list(methods or ALL_METHODS)
    rows = []
    for data in datasets:
        weak = data == "Music-1M"
        types = MUSIC_1M_TYPES if weak else MUSIC_TYPES
        for scen in SCENARIOS:
            for t in types:
                sc = music_scenario(spark, t, scen, weak=weak, seed=seed, **scale)
                res = evaluate_methods(
                    sc, methods, n_seeds=n_seeds, train_cfg=train_cfg
                )
                for m, (mean, std) in res.items():
                    rows.append(
                        {
                            "Data": data,
                            "Scenario": scen,
                            "Type": t,
                            "Method": m,
                            "PRAUC": _fmt(mean, std),
                            "_mean": round(mean, 4),
                        }
                    )
    return rows


def table8_rows(
    spark: SparkSession,
    *,
    methods: list[str] | None = None,
    n_seeds: int = 1,
    seed: int = 0,
    train_cfg: TrainConfig | None = None,
    **scale,
) -> list[dict]:
    """Monitor MEL PRAUC: methods × scenarios (Table 8)."""
    methods = list(methods or ALL_METHODS)
    rows = []
    for scen in SCENARIOS:
        sc = monitor_scenario(spark, scen, seed=seed, **scale)
        res = evaluate_methods(sc, methods, n_seeds=n_seeds, train_cfg=train_cfg)
        for m, (mean, std) in res.items():
            rows.append(
                {
                    "Data": "Monitor",
                    "Scenario": scen,
                    "Method": m,
                    "PRAUC": _fmt(mean, std),
                    "_mean": round(mean, 4),
                }
            )
    return rows


# ------------------------------------------------------------------ Table 4

def table4_rows(
    spark: SparkSession, *, seed: int = 0, top_k: int = 5,
    train_cfg: TrainConfig | None = None, **scale,
) -> list[dict]:
    """Top-k learned feature importance, AdaMEL-hyb (Table 4)."""
    rows = []
    for data, sc in (
        ("Monitor", monitor_scenario(spark, "overlap", seed=seed)),
        ("Music-3K, artist", music_scenario(spark, "artist", "overlap", seed=seed, **scale)),
    ):
        r = run_adamel(sc, "AdaMEL-hyb", seed=seed, train_cfg=train_cfg)
        att = r["attention_target"]
        names = r["feature_names"]
        for j in np.argsort(-att)[:top_k]:
            rows.append(
                {
                    "Data": data,
                    "Feature": names[j].capitalize(),
                    "Score": round(float(att[j]), 4),
                }
            )
    return rows


# ------------------------------------------------------------------ Table 5

def _subset_eval(sc_full: Scenario, attrs: list[str], seed: int,
                 train_cfg: TrainConfig | None) -> float:
    sub = Scenario(
        attrs=attrs, train=sc_full.train, support=sc_full.support, test=sc_full.test,
        dim=sc_full.dim,
    )
    r = run_adamel(sub, "AdaMEL-hyb", seed=seed, train_cfg=train_cfg)
    return pr_auc(r["y"], r["scores"])


# The "top attributes" the paper selects per dataset (§5.4); ours mirror
# the generator's discriminators, which Table 4 confirms empirically.
TOP_ATTRS = {
    "Monitor": ["page_title", "source", "manufacturer"],
    "Music-3K, artist": ["main_performer", "name", "name_native_language", "source"],
    "Music-3K, album": ["main_performer", "name", "name_native_language", "source"],
    "Music-3K, track": ["name", "main_performer", "version"],
}


def table5_rows(
    spark: SparkSession, *, seed: int = 0, train_cfg: TrainConfig | None = None,
    datasets: tuple[str, ...] = (
        "Monitor", "Music-3K, artist", "Music-3K, album", "Music-3K, track"
    ),
    **scale,
) -> list[dict]:
    """PRAUC with top vs other vs all attributes, AdaMEL-hyb (Table 5)."""
    rows = []
    for name in datasets:
        if name == "Monitor":
            sc = monitor_scenario(spark, "overlap", seed=seed)
            all_attrs = mon.ATTRS
        else:
            t = name.split(", ")[1]
            sc = music_scenario(spark, t, "overlap", seed=seed, **scale)
            all_attrs = mus.ATTRS
        top = TOP_ATTRS[name]
        other = [a for a in all_attrs if a not in top]
        rows.append(
            {
                "Dataset": name,
                "Top Attributes": f"{_subset_eval(sc, top, seed, train_cfg):.4f} ({len(top)})",
                "Other Attributes": f"{_subset_eval(sc, other, seed, train_cfg):.4f} ({len(other)})",
                "All Attributes": f"{_subset_eval(sc, list(all_attrs), seed, train_cfg):.4f} ({len(all_attrs)})",
            }
        )
    return rows


# ------------------------------------------------------------------ Table 6

def table6_rows(
    spark: SparkSession, *, seed: int = 0, train_cfg: TrainConfig | None = None,
    types: tuple[str, ...] = ("artist", "album"), **scale,
) -> list[dict]:
    """Contrastive-feature ablation: shared / unique / both (Table 6)."""
    rows = []
    for t in types:
        sc = music_scenario(spark, t, "overlap", seed=seed, **scale)
        for method in ("AdaMEL-base", "AdaMEL-hyb"):
            row = {"Dataset": f"Music-3K, {t}", "Method": method}
            for mode in ("shared", "unique", "both"):
                sub = Scenario(
                    attrs=sc.attrs, train=sc.train, support=sc.support,
                    test=sc.test, dim=sc.dim, mode=mode,
                )
                r = run_adamel(sub, method, seed=seed, train_cfg=train_cfg)
                row[mode.capitalize()] = round(pr_auc(r["y"], r["scores"]), 4)
            rows.append(row)
    return rows


# ------------------------------------------------------------------ Table 7

def table7_rows(
    spark: SparkSession,
    *,
    methods: tuple[str, ...] = ("DeepMatcher", "AdaMEL-zero", "AdaMEL-hyb"),
    datasets: tuple[str, ...] | None = None,
    seed: int = 0,
    n_entities: int = 150,
    train_cfg: TrainConfig | None = None,
) -> list[dict]:
    """Single-domain F1 on the benchmark datasets (Table 7)."""
    rows = []
    for name in datasets or tuple(bench.BENCHMARKS):
        cfg = bench.BENCHMARKS[name]
        sc = benchmark_scenario(spark, name, n_entities=n_entities, seed=seed)
        res = evaluate_methods(
            sc, list(methods), metric="f1", n_seeds=1, train_cfg=train_cfg
        )
        row = {"Type": cfg.kind, "Dataset": name, "Domain": cfg.domain}
        for m, (mean, _) in res.items():
            row[m] = round(100 * mean, 1)
        rows.append(row)
    return rows


# ------------------------------------------------------- Fig. 8 (λ sweep)

def fig8_rows(
    spark: SparkSession,
    *,
    lambdas: tuple[float, ...] = (0.0, 0.25, 0.5, 0.75, 0.9, 0.98, 1.0),
    types: tuple[str, ...] = ("artist", "album"),
    seed: int = 0,
    base_cfg: TrainConfig | None = None,
    **scale,
) -> list[dict]:
    """PRAUC vs λ for AdaMEL-zero and -hyb (Fig. 8, table form)."""
    rows = []
    for t in types:
        sc = music_scenario(spark, t, "overlap", seed=seed, **scale)
        for variant in ("AdaMEL-zero", "AdaMEL-hyb"):
            for lam in lambdas:
                cfg = TrainConfig(**{**(base_cfg or TrainConfig()).__dict__, "lam": lam})
                r = run_adamel(sc, variant, seed=seed, train_cfg=cfg)
                rows.append(
                    {
                        "Dataset": f"Music-3K, {t}",
                        "Method": variant,
                        "lambda": lam,
                        "PRAUC": round(pr_auc(r["y"], r["scores"]), 4),
                    }
                )
    return rows


# ------------------------------------------------- Fig. 10 (|S_U| sweep)

def fig10_rows(
    spark: SparkSession,
    *,
    support_sizes: tuple[int, ...] = (1, 5, 10, 20, 60, 100, 140, 200, 300),
    seed: int = 0,
    train_cfg: TrainConfig | None = None,
) -> list[dict]:
    """PRAUC vs support-set size on Monitor (Fig. 10, table form)."""
    big = SplitSizes(
        train_pos=MONITOR_SIZES.train_pos, train_neg=MONITOR_SIZES.train_neg,
        support_pos=150, support_neg=150,
        test_pos=MONITOR_SIZES.test_pos, test_neg=MONITOR_SIZES.test_neg,
    )
    sc = monitor_scenario(spark, "overlap", seed=seed, sizes=big)
    data = sc.adamel_data()
    ids_sup, y_sup, H_sup = data["support"]
    rng = np.random.default_rng(seed)
    order = rng.permutation(len(y_sup))
    rows = []
    for n in support_sizes:
        n_eff = min(n, len(y_sup))
        idx = order[:n_eff]
        sub = dict(data)
        sub["support"] = ([ids_sup[i] for i in idx], y_sup[idx], H_sup[idx])
        sc_sub = Scenario(
            attrs=sc.attrs, train=sc.train, support=sc.support, test=sc.test,
            dim=sc.dim,
        )
        sc_sub._adamel_cache[("both", tuple(sc.attrs))] = sub
        for variant in ("AdaMEL-few", "AdaMEL-hyb"):
            r = run_adamel(sc_sub, variant, seed=seed, train_cfg=train_cfg)
            rows.append(
                {
                    "|S_U|": n_eff,
                    "Method": variant,
                    "PRAUC": round(pr_auc(r["y"], r["scores"]), 4),
                }
            )
    return rows


# ------------------------------------- Fig. 9 (incremental data sources)

def figure9_rows(
    spark: SparkSession,
    *,
    methods: tuple[str, ...] = ("AdaMEL-hyb", "EntityMatcher", "CorDel-Attention"),
    steps: tuple[int, ...] = (7, 11, 15, 19, 24),
    seed: int = 0,
    train_cfg: TrainConfig | None = None,
) -> list[dict]:
    """Stability + runtime as D_T* grows (Fig. 9 plot + runtime table).

    Sources are added incrementally; per step the test set is resampled
    from the pairs within the allowed sources. Runtime sums each
    method's train+score wall time across steps (the paper reports
    total training runtime).
    """
    from ..pairs.assemble import assemble_pairs
    from .scenarios import candidate_pairs

    records = mon.monitor_records(spark, n_entities=300, seed=seed).cache()
    cands = candidate_pairs(
        records, "page_title", seed=seed, n_buckets=16, keep_per_million=400_000
    )
    wide = with_pool(
        assemble_pairs(cands, records, mon.ATTRS), mon.SOURCE_DOMAIN
    ).cache()
    train_m = materialize(
        sample_split(
            wide.where(Fn.col("pool") == "source"),
            MONITOR_SIZES.train_pos, MONITOR_SIZES.train_neg, seed,
        )
    )
    rows = []
    runtimes: dict[str, float] = {m: 0.0 for m in methods}
    for n_sources in steps:
        allowed = mon.SOURCES[:n_sources]
        pool = wide.where(
            Fn.col("source_a").isin(allowed)
            & Fn.col("source_b").isin(allowed)
            & (Fn.col("pool") != "source")
        )
        test = sample_split(pool, 60, 400, seed + n_sources)
        support = sample_split(pool, 50, 50, seed + n_sources + 1, exclude=test)
        sc = Scenario(
            attrs=mon.ATTRS,
            train=train_m,
            support=materialize(support),
            test=materialize(test),
        )
        for m in methods:
            t0 = time.time()
            r = run_method(sc, m, seed=seed, train_cfg=train_cfg)
            runtimes[m] += time.time() - t0
            rows.append(
                {
                    "|D_T*|": n_sources,
                    "Method": m,
                    "PRAUC": round(pr_auc(r["y"], r["scores"]), 4),
                }
            )
    for m in methods:
        rows.append({"|D_T*|": "runtime_s", "Method": m, "PRAUC": round(runtimes[m], 1)})
    return rows
