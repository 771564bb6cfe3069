"""Deterministic hashed word embeddings — offline FastText substitute.

The paper embeds word tokens with pretrained 300-d FastText and *sums*
them per contrastive feature (§4.2, Eq. 3). Offline we cannot ship
FastText, so each token is mapped to a deterministic unit-norm vector
derived from a seeded RNG keyed by the token's stable hash. Properties
preserved (see DESIGN.md §3):

* identical tokens -> identical vectors (sim/uni sums behave the same),
* distinct tokens -> quasi-orthogonal vectors in expectation,
* fully deterministic across processes and Spark executors.

Missing features (empty token list — challenges C1/C2) embed to a fixed
normalized non-zero vector, exactly as §4.3 prescribes ("initializes the
missing attribute values with a fixed normalized non-zero vector").
"""
from __future__ import annotations

import hashlib

import numpy as np

DEFAULT_DIM = 32


def _token_seed(token: str) -> int:
    """Stable 64-bit seed for a token (Python's hash() is salted)."""
    return int.from_bytes(hashlib.blake2b(token.encode("utf-8"), digest_size=8).digest(), "big")


def token_vector(token: str, dim: int = DEFAULT_DIM) -> np.ndarray:
    """Unit-norm embedding for one token, deterministic in ``token``."""
    g = np.random.default_rng(_token_seed(token))
    v = g.standard_normal(dim)
    return v / np.linalg.norm(v)


def missing_vector(dim: int = DEFAULT_DIM) -> np.ndarray:
    """The fixed normalized non-zero vector for empty features (§4.3)."""
    v = np.ones(dim)
    return v / np.linalg.norm(v)


class HashEmbedding:
    """Memoizing token -> vector table.

    ``embed_sum`` sums token vectors (paper Eq. 3 summarization); an
    empty token list returns :func:`missing_vector`. Instances are
    cheap to construct inside mapInPandas partitions; the memo cache is
    per-instance and purely an optimization.
    """

    def __init__(self, dim: int = DEFAULT_DIM):
        self.dim = dim
        self._cache: dict[str, np.ndarray] = {}

    def __call__(self, token: str) -> np.ndarray:
        v = self._cache.get(token)
        if v is None:
            v = token_vector(token, self.dim)
            self._cache[token] = v
        return v

    def embed_sum(self, tokens: list[str]) -> np.ndarray:
        if not tokens:
            return missing_vector(self.dim)
        out = np.zeros(self.dim)
        for t in tokens:
            out += self(t)
        return out
