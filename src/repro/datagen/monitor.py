"""Synthetic Monitor corpus (DI2KG Monitor substitute).

Reproduces the published structure of the DI2KG Monitor dataset
(paper §5.1 + Appendix A.1/A.2):

* **24 data sources**, 5 of them the source domain (the paper names
  ebay.com, catalog.com, best-deal-items.com, cleverboxes.com,
  ca.pcpartpicker.com — we keep those names and synthesize the rest).
* **13 textual attributes**; only ``page_title`` and ``source`` are
  near-complete, the rest have <50 % non-missing pairs (C1, Fig. 11).
* **5 attributes present only in target-domain sources** (C2, Fig. 11):
  every source-domain profile drops them.
* ``prod_type`` token distribution differs between domains (C3,
  Fig. 12) via a per-profile synonym map.
* Extreme label imbalance (>99 % negatives) is produced downstream by
  the split sampler (``pairs/splits.py``), matching App. A.1's
  734-positive / 66 061-negative structure proportionally.

``page_title`` concatenates brand, model code and screen size — the
single dominant feature the paper finds (Table 4: ``Page_title_shared``
score 0.16 vs ~0.05 for everything else).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame, SparkSession

from .entities import SourceProfile, records_df, word

ATTRS = [
    "page_title",
    "source",
    "manufacturer",
    "prod_type",
    "screen_size",
    "resolution",
    "model_code",
    "brand",
    "condition",
    "price",
    "refresh_rate",
    "connectivity",
    "weight",
]

# Attributes with non-missing pairs only in the target domain (C2).
TARGET_ONLY_ATTRS = frozenset(
    {"condition", "price", "refresh_rate", "connectivity", "weight"}
)

SOURCE_DOMAIN = [
    "ebay.com",
    "catalog.com",
    "best-deal-items.com",
    "cleverboxes.com",
    "ca.pcpartpicker.com",
]
TARGET_ONLY = [f"shop{i}.com" for i in range(1, 20)]
SOURCES = SOURCE_DOMAIN + TARGET_ONLY

_BRANDS = ["viewlux", "pixelon", "screenmax", "optivue", "clarion", "lumona"]
_SIZES = ["19", "22", "24", "27", "32", "34"]
_RES = ["1080p", "1440p", "4k", "5k"]
_COND = ["new", "used", "refurbished", "openbox"]
_HZ = ["60hz", "75hz", "144hz", "165hz", "240hz"]
_CONN = ["hdmi", "displayport", "vga", "usbc"]

# C3: target sources use different product-type vocabulary.
_PRODTYPE_SYNONYM = {"monitor": "display", "led": "screen", "lcd": "panel"}


def monitor_profiles() -> list[SourceProfile]:
    common_missing = {
        "page_title": 0.02,
        "source": 0.0,
        "manufacturer": 0.45,
        "prod_type": 0.5,
        "screen_size": 0.55,
        "resolution": 0.6,
        "model_code": 0.55,
        "brand": 0.5,
        "condition": 0.6,
        "price": 0.6,
        "refresh_rate": 0.65,
        "connectivity": 0.65,
        "weight": 0.7,
    }
    profiles = [
        SourceProfile(
            name=s,
            missing=common_missing,
            drop=TARGET_ONLY_ATTRS,
            noise=0.01,
        )
        for s in SOURCE_DOMAIN
    ]
    profiles += [
        SourceProfile(
            name=s,
            missing=common_missing,
            noise=0.02,
            synonym={"prod_type": _PRODTYPE_SYNONYM},
            # target sites render terse page titles (C3): token-overlap
            # statistics on the dominant attribute turn noisy there
            token_drop={"page_title": 0.08},
        )
        for s in TARGET_ONLY
    ]
    return profiles


def monitor_entities(n: int, seed: int = 0) -> list[dict]:
    """Monitor product universe with confusable same-brand families."""
    rng = np.random.default_rng(seed)
    ents = []
    i, eid = 0, 0
    while i < n:
        # confusable family = one model line in several size/resolution
        # variants (same brand + model token, e.g. 24" vs 27" of vx245):
        # token blocking on page_title surfaces them as hard negatives.
        brand = _BRANDS[int(rng.integers(0, len(_BRANDS)))]
        model = f"{word(rng, 1)}{rng.integers(100, 999)}"
        fam = int(rng.integers(2, 4)) if rng.random() < 0.6 else 1
        sizes = list(rng.choice(_SIZES, size=min(fam, len(_SIZES)), replace=False))
        for k in range(min(fam, n - i)):
            size = sizes[k % len(sizes)]
            res = _RES[int(rng.integers(0, len(_RES)))]
            ents.append(
                {
                    "entity_id": eid,
                    "entity_type": "monitor",
                    "page_title": [brand, model, size, "inch", "led", "monitor"],
                    "manufacturer": [brand, "inc"],
                    "prod_type": ["led", "lcd", "monitor"],
                    "screen_size": [size, "inch"],
                    "resolution": [res],
                    "model_code": [model],
                    "brand": [brand],
                    "condition": [_COND[int(rng.integers(0, len(_COND)))]],
                    "price": [str(int(rng.integers(90, 900)))],
                    "refresh_rate": [_HZ[int(rng.integers(0, len(_HZ)))]],
                    "connectivity": list(
                        rng.choice(_CONN, size=2, replace=False)
                    ),
                    "weight": [str(int(rng.integers(3, 12))), "kg"],
                }
            )
            eid += 1
            i += 1
    return ents


def monitor_records(
    spark: SparkSession, *, n_entities: int = 300, seed: int = 0
) -> DataFrame:
    """Monitor records DataFrame across the 24 sources."""
    ents = monitor_entities(n_entities, seed)
    return records_df(
        spark, ents, ATTRS, monitor_profiles(), presence=0.28, seed=seed + 1
    )
