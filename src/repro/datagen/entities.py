"""Entity-universe + per-source corruption engine.

The paper's datasets are multi-source record corpora where each data
source renders the same real-world entity differently. We reproduce
that structure synthetically: a *universe* of ground-truth entities
(token lists per attribute) plus a :class:`SourceProfile` per data
source describing how that source corrupts values. The three challenge
knobs map directly to the paper:

* **C1 missing values** — ``SourceProfile.missing[attr]`` probability;
* **C2 new attributes**  — ``SourceProfile.drop`` (attrs the source
  never emits; an attr dropped by every source-domain source but kept
  by target sources is "new in the target domain");
* **C3 value-distribution shift** — ``SourceProfile.abbrev`` (values
  reduced to initials, the paper's "P.M." example), per-token ``noise``
  and per-source filler vocabularies.

Records are materialized as a Spark DataFrame with one string column
per attribute, plus ``record_id``, ``source``, ``entity_id`` and
``entity_type`` (the last two are ground truth used only for labeling,
never exposed to models).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession


@dataclass
class SourceProfile:
    """How one data source renders entity records."""

    name: str
    missing: dict[str, float] = field(default_factory=dict)
    drop: frozenset[str] = frozenset()
    abbrev: dict[str, float] = field(default_factory=dict)
    noise: float = 0.0
    default_missing: float = 0.0
    # C3 value-distribution shift: per-attribute token rewrite map —
    # e.g. target sources saying "display" where source sources say
    # "monitor" (App. A.2's prod_type token-frequency shift).
    synonym: dict[str, dict[str, str]] = field(default_factory=dict)
    # Per-attribute probability of dropping each token independently —
    # terse renderings ("vx245 monitor" for "viewlux vx245 24 inch led
    # monitor") that make token-overlap statistics noisy.
    token_drop: dict[str, float] = field(default_factory=dict)


def initials(tokens: list[str]) -> list[str]:
    """Abbreviate a multi-token value to initials ("paul mccartney" -> "p m")."""
    return [t[0] for t in tokens if t]


def corrupt_value(
    tokens: list[str],
    attr: str,
    profile: SourceProfile,
    rng: np.random.Generator,
) -> str:
    """Render one attribute value under a source profile (C1-C3)."""
    if attr in profile.drop or not tokens:
        return ""
    if rng.random() < profile.missing.get(attr, profile.default_missing):
        return ""
    toks = list(tokens)
    p_drop = profile.token_drop.get(attr, 0.0)
    if p_drop > 0:
        kept = [t for t in toks if rng.random() >= p_drop]
        toks = kept if kept else [toks[int(rng.integers(0, len(toks)))]]
    if attr in profile.synonym:
        m = profile.synonym[attr]
        toks = [m.get(t, t) for t in toks]
    if rng.random() < profile.abbrev.get(attr, 0.0):
        toks = initials(toks)
    if profile.noise > 0:
        toks = [
            f"zz{rng.integers(0, 10_000)}" if rng.random() < profile.noise else t
            for t in toks
        ]
    return " ".join(toks)


def render_record(
    entity: dict,
    attrs: list[str],
    profile: SourceProfile,
    rng: np.random.Generator,
    copy_index: int = 0,
) -> dict:
    """One record: an entity as seen by one source.

    ``source`` is also emitted as an *attribute value* — the paper's
    corpora treat the data-source name as a regular textual attribute
    (Table 4 lists ``Source_shared`` / ``Source_unique`` features).
    """
    row = {
        "record_id": f"{profile.name}:{entity['entity_id']}:{copy_index}",
        "source": profile.name,
        "entity_id": int(entity["entity_id"]),
        "entity_type": entity.get("entity_type", ""),
    }
    for a in attrs:
        if a == "source":
            row[a] = profile.name
        else:
            row[a] = corrupt_value(entity.get(a, []), a, profile, rng)
    return row


def records_df(
    spark: SparkSession,
    entities: list[dict],
    attrs: list[str],
    profiles: list[SourceProfile],
    *,
    presence: float = 0.8,
    seed: int = 0,
) -> DataFrame:
    """Render every entity through every source (w.p. ``presence``).

    Each (entity, source) combination independently yields a record
    with probability ``presence``, so entities appear in a varying
    subset of sources — the multi-source overlap structure that makes
    cross-source linkage non-trivial.
    """
    rng = np.random.default_rng(seed)
    rows = []
    for ent in entities:
        emitted = 0
        for prof in profiles:
            if rng.random() < presence:
                rows.append(render_record(ent, attrs, prof, rng))
                emitted += 1
        if emitted == 0:  # every entity exists somewhere
            prof = profiles[int(rng.integers(0, len(profiles)))]
            rows.append(render_record(ent, attrs, prof, rng))
    pdf = pd.DataFrame(rows)
    for a in attrs:  # Spark schema: everything textual is a string
        pdf[a] = pdf[a].astype(str)
    return spark.createDataFrame(pdf)


# ---------------------------------------------------------------- vocabulary

_CONSONANT = "bcdfghjklmnprstvwz"
_VOWEL = "aeiou"


def word(rng: np.random.Generator, syllables: int = 2) -> str:
    """Pronounceable synthetic word, deterministic in the RNG state."""
    return "".join(
        _CONSONANT[rng.integers(0, len(_CONSONANT))] + _VOWEL[rng.integers(0, len(_VOWEL))]
        for _ in range(syllables)
    )


def vocab(rng: np.random.Generator, n: int, syllables: int = 2) -> list[str]:
    """``n`` distinct synthetic words."""
    seen: dict[str, None] = {}
    while len(seen) < n:
        seen.setdefault(word(rng, syllables) + str(rng.integers(0, 100)), None)
    return list(seen)


def person_name(rng: np.random.Generator) -> list[str]:
    """Two-token person name."""
    return [word(rng, 2), word(rng, 3)]
