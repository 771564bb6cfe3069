"""Unit tests for repro.text.embed (hashed embeddings)."""
import numpy as np
import pytest

from repro.text.embed import (
    DEFAULT_DIM,
    HashEmbedding,
    missing_vector,
    token_vector,
)


def test_token_vector_deterministic():
    assert np.allclose(token_vector("hello"), token_vector("hello"))


def test_token_vector_distinct_tokens_differ():
    assert not np.allclose(token_vector("hello"), token_vector("world"))


@pytest.mark.parametrize("tok", ["a", "hello", "vx2458", "日本", "x" * 100])
def test_token_vector_unit_norm(tok):
    assert np.linalg.norm(token_vector(tok)) == pytest.approx(1.0)


@pytest.mark.parametrize("dim", [4, 16, 32, 64])
def test_token_vector_dim(dim):
    assert token_vector("t", dim).shape == (dim,)


def test_quasi_orthogonality():
    """Random distinct tokens have small pairwise cosines at D=32."""
    vecs = [token_vector(f"tok{i}") for i in range(50)]
    M = np.stack(vecs)
    cos = M @ M.T - np.eye(50)
    assert np.abs(cos).max() < 0.75
    assert np.abs(cos).mean() < 0.2


def test_missing_vector_unit_and_nonzero():
    v = missing_vector()
    assert np.linalg.norm(v) == pytest.approx(1.0)
    assert (v != 0).all()


def test_missing_vector_fixed():
    assert np.allclose(missing_vector(), missing_vector())


def test_hash_embedding_matches_token_vector():
    emb = HashEmbedding()
    assert np.allclose(emb("song"), token_vector("song"))


def test_hash_embedding_cache_consistency():
    emb = HashEmbedding()
    first = emb("x").copy()
    assert np.allclose(emb("x"), first)


def test_embed_sum_empty_is_missing_vector():
    emb = HashEmbedding()
    assert np.allclose(emb.embed_sum([]), missing_vector())


def test_embed_sum_is_additive():
    emb = HashEmbedding()
    s = emb.embed_sum(["a", "b", "c"])
    assert np.allclose(s, emb("a") + emb("b") + emb("c"))


def test_embed_sum_order_invariant():
    emb = HashEmbedding()
    assert np.allclose(emb.embed_sum(["a", "b"]), emb.embed_sum(["b", "a"]))


def test_embed_sum_duplicate_tokens_count_twice():
    emb = HashEmbedding()
    assert np.allclose(emb.embed_sum(["a", "a"]), 2 * emb("a"))


def test_cross_instance_consistency():
    """Two independent tables (e.g. different executors) agree."""
    assert np.allclose(HashEmbedding()("tok"), HashEmbedding()("tok"))


def test_custom_dim_embedding():
    emb = HashEmbedding(dim=8)
    assert emb.embed_sum(["a"]).shape == (8,)
    assert emb.embed_sum([]).shape == (8,)
