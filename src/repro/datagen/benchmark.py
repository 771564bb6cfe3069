"""Single-domain benchmark datasets for Table 7 (Magellan substitutes).

Table 7 evaluates DeepMatcher vs AdaMEL-zero/-hyb on 11 public
benchmark datasets (7 Structured + 4 Dirty) that are *single-domain*:
two fixed sources, clean schemas, no C1-C3 challenges. We synthesize
one corpus per dataset name with a generic 5-attribute product/citation
schema; per-dataset difficulty is calibrated with three knobs:

* ``noise``      — per-token corruption probability (typo-like noise),
* ``confusable`` — fraction of entities generated in near-duplicate
                   families (hard negatives),
* ``missing``    — per-attribute missing-value probability.

**Dirty** variants apply the Magellan "dirty" construction: with
probability ``dirty_p`` an attribute's value is moved into a random
*other* attribute (appended there, original blanked) — attribute
position becomes unreliable, which is exactly what breaks
position-locked matchers.

The absolute F1 values of the originals are not reproducible from
synthetic text; the knobs are set so the *relative difficulty ordering*
of the paper's Table 7 holds (Fodors-Zagats/DBLP-ACM easy …
Walmart-Amazon/Amazon-Google hard, Dirty harder than Structured).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from .entities import SourceProfile, person_name, render_record, word

ATTRS = ["name", "maker", "descr", "price", "year"]
SOURCES = ["left", "right"]


@dataclass(frozen=True)
class BenchConfig:
    name: str
    kind: str  # "Structured" | "Dirty"
    domain: str
    noise: float
    confusable: float
    missing: float
    dirty_p: float = 0.0


BENCHMARKS: dict[str, BenchConfig] = {
    c.name: c
    for c in [
        BenchConfig("Amazon-Google", "Structured", "Software", 0.22, 0.75, 0.25),
        BenchConfig("Beer", "Structured", "Product", 0.15, 0.55, 0.15),
        BenchConfig("DBLP-ACM", "Structured", "Citation", 0.02, 0.10, 0.05),
        BenchConfig("DBLP-Google", "Structured", "Citation", 0.06, 0.20, 0.08),
        BenchConfig("Fodors-Zagats", "Structured", "Restaurant", 0.01, 0.05, 0.02),
        BenchConfig("iTunes-Amazon", "Structured", "Music", 0.08, 0.30, 0.10),
        BenchConfig("Walmart-Amazon", "Structured", "Electronics", 0.20, 0.70, 0.25),
        BenchConfig("Dirty-DBLP-ACM", "Dirty", "Citation", 0.02, 0.10, 0.05, 0.30),
        BenchConfig("Dirty-DBLP-Google", "Dirty", "Citation", 0.06, 0.20, 0.08, 0.30),
        BenchConfig("Dirty-iTunes-Amazon", "Dirty", "Music", 0.08, 0.30, 0.10, 0.35),
        BenchConfig("Dirty-Walmart-Amazon", "Dirty", "Electronics", 0.20, 0.70, 0.25, 0.40),
    ]
}


def _bench_entities(cfg: BenchConfig, n: int, rng: np.random.Generator) -> list[dict]:
    ents = []
    i, eid = 0, 0
    while i < n:
        in_family = rng.random() < cfg.confusable
        fam = int(rng.integers(2, 4)) if in_family else 1
        shared = word(rng, 3)
        for _ in range(min(fam, n - i)):
            name = [shared, word(rng, 2)] if in_family else [word(rng, 3), word(rng, 2)]
            ents.append(
                {
                    "entity_id": eid,
                    "entity_type": cfg.domain.lower(),
                    "name": name + [word(rng, 2)],
                    "maker": person_name(rng),
                    "descr": [word(rng, 2) for _ in range(4)],
                    "price": [str(int(rng.integers(5, 500)))],
                    "year": [str(1990 + int(rng.integers(0, 35)))],
                }
            )
            eid += 1
            i += 1
    return ents


def _dirty(row: dict, p: float, rng: np.random.Generator) -> dict:
    """Magellan dirty construction: move values into wrong attributes."""
    out = dict(row)
    for a in ATTRS:
        if out[a] and rng.random() < p:
            others = [o for o in ATTRS if o != a]
            tgt = others[int(rng.integers(0, len(others)))]
            out[tgt] = (out[tgt] + " " + out[a]).strip()
            out[a] = ""
    return out


def benchmark_records(
    spark: SparkSession, name: str, *, n_entities: int = 150, seed: int = 0
) -> DataFrame:
    """Two-source single-domain corpus for one Table-7 dataset."""
    cfg = BENCHMARKS[name]
    rng = np.random.default_rng(seed)
    ents = _bench_entities(cfg, n_entities, rng)
    profiles = [
        SourceProfile(name=s, noise=cfg.noise, default_missing=cfg.missing)
        for s in SOURCES
    ]
    rows = []
    for ent in ents:
        for prof in profiles:  # every entity exists in both sources
            row = render_record(ent, ATTRS, prof, rng)
            if cfg.dirty_p > 0:
                row = _dirty(row, cfg.dirty_p, rng)
            rows.append(row)
    pdf = pd.DataFrame(rows)
    for a in ATTRS:
        pdf[a] = pdf[a].astype(str)
    return spark.createDataFrame(pdf)
