"""Tokenization for attribute values.

The paper tokenizes attribute values into word tokens and crops each
attribute to at most ``CROP_SIZE`` tokens (§5.1: "cropping size = 20",
as in CorDel). Values are lowercased and split on non-alphanumeric
characters; empty values (challenge C1/C2 dummies) tokenize to ``[]``.
"""
from __future__ import annotations

import re

CROP_SIZE = 20

_SPLIT = re.compile(r"[^0-9a-z]+")


def tokenize(value: str | None, crop: int = CROP_SIZE) -> list[str]:
    """Lowercase, split on non-alphanumerics, crop to ``crop`` tokens.

    ``None`` and empty/whitespace-only strings (missing attribute values)
    return the empty list.
    """
    if value is None:
        return []
    toks = [t for t in _SPLIT.split(value.lower()) if t]
    return toks[:crop]


def sim_uni(tokens_a: list[str], tokens_b: list[str]) -> tuple[list[str], list[str]]:
    """Contrastive split of an attribute's tokens (Eq. 2).

    ``sim`` = tokens present in both records, ``uni`` = symmetric
    difference. Multiplicity is dropped (set semantics), matching the
    paper's set-builder definition. Output order is sorted for
    determinism so embedding sums are reproducible.
    """
    sa, sb = set(tokens_a), set(tokens_b)
    return sorted(sa & sb), sorted(sa ^ sb)
