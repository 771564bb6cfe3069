"""Synthetic multi-source Music corpus (Music-3K-lite / Music-1M-lite).

Stands in for the paper's Amazon-internal Music-3K / Music-1M corpora
(7 public music websites, entity types artist / album / track, 9
attributes — Table 2). The generator reproduces the *structure* that
drives the paper's results:

* **Source domain** = ``site1..site3``: ``main_performer`` fully
  spelled, ``name_native_language`` and ``version`` mostly missing
  (rarely-seen attributes, C2).
* **Target domain** = ``site4..site7``: ``main_performer`` abbreviated
  to initials (the paper's "P.M." example, C3), while
  ``name_native_language`` (artists/albums) and ``version`` (tracks)
  are present and discriminative — the attributes whose importance a
  source-trained model underestimates.
* **Confusable families**: artists sharing a surname, albums sharing a
  title across performers ("Hello"), tracks sharing title+performer but
  differing in ``version`` (remix/cover — the paper's track-diversity
  discussion). Token-overlap blocking turns these into hard negatives.

Music-1M-lite is the same universe at a larger pair volume with
**weak labels**: a fraction of pair labels is flipped and mixed-type
"hyperlink" matches (artist↔album of the same performer) are injected
as false positives, matching the paper's description of Music-1M. It
shares Music-3K's clean test set (§5.1 "Music-1M shares the same
testing set as Music-3K").
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame, SparkSession

from .entities import SourceProfile, person_name, records_df, vocab, word

ATTRS = [
    "name",
    "main_performer",
    "name_native_language",
    "source",
    "genre",
    "country",
    "year",
    "label",
    "version",
]

SOURCES = [f"site{i}" for i in range(1, 8)]
SOURCE_DOMAIN = ["site1", "site2", "site3"]
TARGET_ONLY = [s for s in SOURCES if s not in SOURCE_DOMAIN]

_GENRES = ["rock", "pop", "jazz", "folk", "electronic", "classical"]
_COUNTRIES = ["usa", "uk", "japan", "brazil", "france", "germany"]
_VERSIONS = ["original", "remix", "cover", "live"]


def music_profiles() -> list[SourceProfile]:
    """The 7 website profiles (3 source-domain, 4 target-domain).

    Source sites spell ``main_performer`` fully (it is the clean
    discriminator a supervised model latches onto) and rarely carry
    ``name_native_language`` / ``version``. Target sites abbreviate the
    performer to initials (C3 — within a homonym family the initials
    collide, so the source-learned feature becomes uninformative or
    inverted) while the rarely-seen attributes are present and
    discriminative — the importance shift AdaMEL is built to adapt to.
    """
    profiles = []
    for s in SOURCE_DOMAIN:
        profiles.append(
            SourceProfile(
                name=s,
                missing={
                    "name_native_language": 0.45,
                    "version": 0.75,
                    "genre": 0.2,
                    "country": 0.2,
                    "label": 0.3,
                },
                abbrev={},
                noise=0.05,
                default_missing=0.05,
            )
        )
    for s in TARGET_ONLY:
        profiles.append(
            SourceProfile(
                name=s,
                missing={
                    "name_native_language": 0.20,
                    "version": 0.10,
                    "main_performer": 0.30,
                    "genre": 0.35,
                    "country": 0.35,
                    "label": 0.5,
                },
                abbrev={"main_performer": 0.85},
                noise=0.06,
                default_missing=0.05,
            )
        )
    return profiles


def _artist_entities(n: int, rng: np.random.Generator, base_id: int) -> list[dict]:
    """Homonym families: members share the exact ``name``; the spelled
    ``main_performer`` (name + distinct epithet) separates them in the
    source domain, but its target-domain abbreviation collides. The
    unique ``name_native_language`` transliteration is the
    target-domain discriminator (rarely present in source sites)."""
    ents = []
    i = 0
    eid = base_id
    # per-family epithet sets share a first letter, so target-domain
    # abbreviation collapses them ("band"/"beat" -> "b"/"b")
    epithet_sets = [
        ["band", "beat", "boys", "bros"],
        ["trio", "team", "tones", "twins"],
        ["duo", "dogs", "dreams", "daze"],
        ["sound", "stars", "set", "sons"],
    ]
    while i < n:
        fam = int(rng.integers(2, 4)) if rng.random() < 0.6 else 1
        name = [word(rng, 2), word(rng, 3)]  # shared by the whole family
        eps = epithet_sets[int(rng.integers(0, len(epithet_sets)))]
        # weak attributes are family-shared: they never separate the
        # family's hard negatives, only the discriminators below do
        genre = [_GENRES[rng.integers(0, len(_GENRES))]]
        country = [_COUNTRIES[rng.integers(0, len(_COUNTRIES))]]
        year = [str(1960 + int(rng.integers(0, 60)))]
        label = [word(rng, 2), "records"]
        for k in range(min(fam, n - i)):
            native = [word(rng, 3), word(rng, 3)]  # unique transliteration
            ents.append(
                {
                    "entity_id": eid,
                    "entity_type": "artist",
                    "name": list(name),
                    "main_performer": name + [eps[k % len(eps)]],
                    "name_native_language": native,
                    "genre": list(genre),
                    "country": list(country),
                    "year": list(year),
                    "label": list(label),
                    "version": [],
                }
            )
            eid += 1
            i += 1
    return ents


def _album_entities(n: int, rng: np.random.Generator, base_id: int) -> list[dict]:
    ents = []
    i = 0
    eid = base_id
    titles = vocab(rng, max(8, n // 3))
    while i < n:
        # confusable group: same title ("Hello"), different performers
        # whose *initials* collide partially once target sites
        # abbreviate them (the paper's "A. A." vs "A. W." example).
        fam = int(rng.integers(2, 4)) if rng.random() < 0.6 else 1
        title = [titles[int(rng.integers(0, len(titles)))], word(rng, 2)]
        fam_initial = word(rng, 1)[0]
        genre = [_GENRES[rng.integers(0, len(_GENRES))]]
        country = [_COUNTRIES[rng.integers(0, len(_COUNTRIES))]]
        year = [str(1970 + int(rng.integers(0, 50)))]
        label = [word(rng, 2), "records"]
        for _ in range(min(fam, n - i)):
            # performers share both initials within the family, so
            # abbreviation makes them indistinguishable ("a w" vs "a w")
            first = fam_initial + word(rng, 2)[1:]
            last = fam_initial + word(rng, 3)[1:]
            performer = [first, last]
            ents.append(
                {
                    "entity_id": eid,
                    "entity_type": "album",
                    "name": title,
                    "main_performer": performer,
                    "name_native_language": [word(rng, 3), word(rng, 2)],
                    "genre": list(genre),
                    "country": list(country),
                    "year": list(year),
                    "label": list(label),
                    "version": [],
                }
            )
            eid += 1
            i += 1
    return ents


def _track_entities(n: int, rng: np.random.Generator, base_id: int) -> list[dict]:
    ents = []
    i = 0
    eid = base_id
    while i < n:
        # one recording released in several versions: each version is a
        # distinct digital entity (paper: remix/cover are non-matches)
        title = [word(rng, 2), word(rng, 3)]
        performer = person_name(rng)
        native = [word(rng, 3)]  # transliterated title: same across versions
        genre = [_GENRES[rng.integers(0, len(_GENRES))]]
        country = [_COUNTRIES[rng.integers(0, len(_COUNTRIES))]]
        year = [str(1980 + int(rng.integers(0, 45)))]
        label = [word(rng, 2), word(rng, 2)]
        n_ver = int(rng.integers(2, 4)) if rng.random() < 0.6 else 1
        vers = list(rng.choice(_VERSIONS, size=n_ver, replace=False))
        for v in vers:
            if i >= n:
                break
            # versions of one recording share every attribute except
            # ``version`` — only that attribute separates the hard pair
            ents.append(
                {
                    "entity_id": eid,
                    "entity_type": "track",
                    "name": title,
                    "main_performer": performer,
                    "name_native_language": list(native),
                    "genre": list(genre),
                    "country": list(country),
                    "year": list(year),
                    "label": list(label),
                    "version": [v],
                }
            )
            eid += 1
            i += 1
    return ents


def music_entities(n_per_type: int, seed: int = 0) -> list[dict]:
    """Universe of artist + album + track entities, globally-unique ids."""
    rng = np.random.default_rng(seed)
    ents = _artist_entities(n_per_type, rng, 0)
    ents += _album_entities(n_per_type, rng, 1_000_000)
    ents += _track_entities(n_per_type, rng, 2_000_000)
    return ents


def music_records(
    spark: SparkSession, *, n_per_type: int = 120, seed: int = 0
) -> DataFrame:
    """Music corpus records DataFrame across the 7 sites."""
    ents = music_entities(n_per_type, seed)
    return records_df(
        spark, ents, ATTRS, music_profiles(), presence=0.55, seed=seed + 1
    )
