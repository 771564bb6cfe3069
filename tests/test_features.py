"""Tests for the AdaMEL featurizer (pairs/features.py)."""
import numpy as np
import pytest

from repro.pairs.features import (
    MODES,
    adamel_features,
    collect_features,
    feature_names,
    pair_tensor,
)
from repro.text.embed import HashEmbedding, missing_vector


@pytest.fixture(scope="module")
def emb():
    return HashEmbedding(16)


def test_feature_names_both():
    assert feature_names(["x", "y"]) == ["x_shared", "x_unique", "y_shared", "y_unique"]


def test_feature_names_single_modes():
    assert feature_names(["x", "y"], "shared") == ["x_shared", "y_shared"]
    assert feature_names(["x", "y"], "unique") == ["x_unique", "y_unique"]


def test_feature_names_bad_mode():
    with pytest.raises(ValueError):
        feature_names(["x"], "nope")


def test_pair_tensor_shape_both(emb):
    h = pair_tensor(["a b", "c"], ["b d", "c"], emb)
    assert h.shape == (4, 16)


@pytest.mark.parametrize("mode,f", [("both", 4), ("shared", 2), ("unique", 2)])
def test_pair_tensor_mode_shapes(emb, mode, f):
    h = pair_tensor(["a", "b"], ["a", "c"], emb, mode)
    assert h.shape == (f, 16)


def test_pair_tensor_rows_unit_norm(emb):
    h = pair_tensor(["a b c", ""], ["b d", "x"], emb)
    assert np.allclose(np.linalg.norm(h, axis=1), 1.0)


def test_pair_tensor_missing_both_sides(emb):
    h = pair_tensor([""], [""], emb)
    mv = missing_vector(16)
    assert np.allclose(h[0], mv)  # sim empty -> missing vector (unit)
    assert np.allclose(h[1], mv)  # uni empty too


def test_pair_tensor_identical_values_unique_is_missing(emb):
    h = pair_tensor(["hello world"], ["hello world"], emb)
    assert np.allclose(h[1], missing_vector(16))
    assert not np.allclose(h[0], missing_vector(16))


def test_pair_tensor_disjoint_values_shared_is_missing(emb):
    h = pair_tensor(["aa bb"], ["cc dd"], emb)
    assert np.allclose(h[0], missing_vector(16))


def test_pair_tensor_matches_manual_sum(emb):
    h = pair_tensor(["a b"], ["b c"], emb)
    sim = emb.embed_sum(["b"])
    uni = emb.embed_sum(["a", "c"])
    assert np.allclose(h[0], sim / np.linalg.norm(sim))
    assert np.allclose(h[1], uni / np.linalg.norm(uni))


def test_pair_tensor_none_values(emb):
    h = pair_tensor([None], ["x"], emb)
    assert h.shape == (2, 16)


def test_adamel_features_matches_local(spark, music_wide_tiny):
    """The distributed kernel equals the driver-side pair_tensor."""
    from repro.datagen.music import ATTRS

    sample = music_wide_tiny.limit(12)
    fdf = adamel_features(sample, ATTRS, dim=16)
    ids, y, H = collect_features(fdf, 2 * len(ATTRS), 16)
    rows = {r["pair_id"]: r.asDict() for r in sample.collect()}
    emb = HashEmbedding(16)
    for i, pid in enumerate(ids):
        r = rows[pid]
        expected = pair_tensor(
            [r[f"a_{a}"] for a in ATTRS], [r[f"b_{a}"] for a in ATTRS], emb
        )
        assert np.allclose(H[i], expected)


def test_adamel_features_schema(spark, music_wide_tiny):
    from repro.datagen.music import ATTRS

    fdf = adamel_features(music_wide_tiny.limit(3), ATTRS, dim=8)
    assert fdf.columns == ["pair_id", "label", "h"]
    row = fdf.first()
    assert len(row["h"]) == 2 * len(ATTRS) * 8


def test_adamel_features_mode_dims(spark, music_wide_tiny):
    from repro.datagen.music import ATTRS

    fdf = adamel_features(music_wide_tiny.limit(3), ATTRS, dim=8, mode="shared")
    assert len(fdf.first()["h"]) == len(ATTRS) * 8


def test_adamel_features_bad_mode(spark, music_wide_tiny):
    from repro.datagen.music import ATTRS

    with pytest.raises(ValueError):
        adamel_features(music_wide_tiny, ATTRS, mode="bogus")


def test_collect_features_empty(spark, music_wide_tiny):
    from repro.datagen.music import ATTRS
    from pyspark.sql import functions as F

    empty = music_wide_tiny.where(F.lit(False))
    ids, y, H = collect_features(adamel_features(empty, ATTRS, dim=8), 18, 8)
    assert ids == [] and y.shape == (0,) and H.shape == (0, 18, 8)


def test_collect_features_labels_match(spark, music_wide_tiny):
    from repro.datagen.music import ATTRS

    sample = music_wide_tiny.limit(20)
    fdf = adamel_features(sample, ATTRS, dim=8)
    ids, y, _ = collect_features(fdf, 18, 8)
    truth = {r["pair_id"]: r["label"] for r in sample.collect()}
    for pid, label in zip(ids, y):
        assert truth[pid] == label
