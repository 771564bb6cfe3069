"""Distributed inference == driver-side numpy (core/infer.py)."""
import numpy as np
import pytest

from repro.core.infer import mean_attention_distributed, score_distributed
from repro.core.model import ModelConfig, attention, fit_standardizer, init_params, predict
from repro.datagen.music import ATTRS
from repro.pairs.features import adamel_features, collect_features

DIM = 8
NF = 2 * len(ATTRS)


@pytest.fixture(scope="module")
def fdf(spark, music_wide_tiny):
    return adamel_features(music_wide_tiny.limit(60), ATTRS, dim=DIM).cache()


@pytest.fixture(scope="module")
def params(fdf):
    p = init_params(ModelConfig(n_features=NF, dim=DIM, seed=3))
    _, _, H = collect_features(fdf, NF, DIM)
    fit_standardizer(p, H)
    return p


def test_score_distributed_matches_local(spark, fdf, params):
    ids, _, H = collect_features(fdf, NF, DIM)
    local = dict(zip(ids, predict(params, H)))
    dist = {r["pair_id"]: r["score"] for r in score_distributed(fdf, params, NF, DIM).collect()}
    assert set(dist) == set(local)
    for pid in local:
        assert dist[pid] == pytest.approx(local[pid], abs=1e-9)


def test_score_distributed_partitioning_invariant(spark, fdf, params):
    one = score_distributed(fdf.coalesce(1), params, NF, DIM).collect()
    many = score_distributed(fdf.repartition(7), params, NF, DIM).collect()
    assert sorted((r["pair_id"], round(r["score"], 12)) for r in one) == sorted(
        (r["pair_id"], round(r["score"], 12)) for r in many
    )


def test_score_distributed_carries_labels(spark, fdf, params):
    rows = score_distributed(fdf, params, NF, DIM).collect()
    assert all(r["label"] in (0.0, 1.0) for r in rows)


def test_mean_attention_matches_local(spark, fdf, params):
    _, _, H = collect_features(fdf, NF, DIM)
    local = attention(params, H).mean(axis=0)
    dist = mean_attention_distributed(fdf, params, NF, DIM)
    assert np.allclose(dist, local, atol=1e-9)


def test_mean_attention_partitioning_invariant(spark, fdf, params):
    a = mean_attention_distributed(fdf.coalesce(1), params, NF, DIM)
    b = mean_attention_distributed(fdf.repartition(5), params, NF, DIM)
    assert np.allclose(a, b, atol=1e-12)


def test_mean_attention_empty_uniform(spark, fdf, params):
    from pyspark.sql import functions as F

    empty = fdf.where(F.lit(False))
    g = mean_attention_distributed(empty, params, NF, DIM)
    assert np.allclose(g, 1.0 / NF)


def test_mean_attention_sums_to_one(spark, fdf, params):
    g = mean_attention_distributed(fdf, params, NF, DIM)
    assert g.sum() == pytest.approx(1.0)
