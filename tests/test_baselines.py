"""Tests for the five baseline re-implementations."""
import numpy as np
import pytest

from repro.baselines import cordel, deepmatcher, ditto, entitymatcher, tler
from repro.baselines.common import NumpyMLP, collect_vectors, sim_stats
from repro.datagen.music import ATTRS

MODULES = {
    "tler": tler,
    "deepmatcher": deepmatcher,
    "entitymatcher": entitymatcher,
    "ditto": ditto,
    "cordel": cordel,
}


# ---------------------------------------------------------------- sim_stats

def test_sim_stats_identical():
    s = sim_stats(["a", "b"], ["a", "b"])
    assert s[0] == 1.0 and s[3] == 1.0 and s[4] == 0.0 and s[5] == 0.0


def test_sim_stats_disjoint():
    s = sim_stats(["a"], ["b"])
    assert s[0] == 0.0 and s[1] == 0.0


def test_sim_stats_partial_overlap():
    jac, cont, lenr, exact, bm, om = sim_stats(["a", "b"], ["b", "c", "d"])
    assert jac == pytest.approx(1 / 4)
    assert cont == pytest.approx(1 / 2)
    assert lenr == pytest.approx(2 / 3)
    assert exact == 0.0


def test_sim_stats_missing_flags():
    assert sim_stats([], [])[4] == 1.0
    assert sim_stats([], ["a"])[5] == 1.0


# -------------------------------------------------------------------- MLP

def test_mlp_learns_linearly_separable():
    rng = np.random.default_rng(0)
    X = rng.standard_normal((300, 5))
    y = (X[:, 0] + 0.5 * X[:, 1] > 0).astype(float)
    m = NumpyMLP(5, hidden=[16], seed=0, epochs=40).fit(X, y)
    acc = ((m.predict(X) > 0.5) == (y == 1)).mean()
    assert acc > 0.95


def test_mlp_no_hidden_is_logistic_regression():
    rng = np.random.default_rng(1)
    X = rng.standard_normal((200, 3))
    y = (X[:, 0] > 0).astype(float)
    m = NumpyMLP(3, hidden=[], seed=0, epochs=150, lr=1e-2).fit(X, y)
    assert ((m.predict(X) > 0.5) == (y == 1)).mean() > 0.95
    assert len(m.Ws) == 1


def test_mlp_learns_xor_with_hidden_layer():
    rng = np.random.default_rng(2)
    X = rng.choice([-1.0, 1.0], size=(400, 2)) + rng.standard_normal((400, 2)) * 0.05
    y = ((X[:, 0] > 0) ^ (X[:, 1] > 0)).astype(float)
    m = NumpyMLP(2, hidden=[16], seed=0, epochs=150, lr=1e-2).fit(X, y)
    assert ((m.predict(X) > 0.5) == (y == 1)).mean() > 0.9


def test_mlp_deterministic():
    rng = np.random.default_rng(3)
    X = rng.standard_normal((50, 4))
    y = rng.integers(0, 2, 50).astype(float)
    p1 = NumpyMLP(4, seed=0, epochs=5).fit(X, y).predict(X)
    p2 = NumpyMLP(4, seed=0, epochs=5).fit(X, y).predict(X)
    assert np.allclose(p1, p2)


def test_mlp_standardizes_inputs():
    rng = np.random.default_rng(4)
    X = rng.standard_normal((100, 2)) * 1e4 + 1e6  # wild scale
    y = (X[:, 0] > 1e6).astype(float)
    m = NumpyMLP(2, hidden=[8], seed=0, epochs=40).fit(X, y)
    assert ((m.predict(X) > 0.5) == (y == 1)).mean() > 0.9


# ------------------------------------------------------------- featurizers

@pytest.mark.parametrize("name", sorted(MODULES))
def test_featurizer_dims_match_n_inputs(spark, music_wide_tiny, name):
    mod = MODULES[name]
    fdf = mod.featurize(music_wide_tiny.limit(6), ATTRS, dim=16)
    _, y, X = collect_vectors(fdf)
    assert X.shape == (6, mod.n_inputs(ATTRS, 16))
    assert set(np.unique(y)) <= {0.0, 1.0}


@pytest.mark.parametrize("name", sorted(MODULES))
def test_featurizer_deterministic(spark, music_wide_tiny, name):
    mod = MODULES[name]
    sample = music_wide_tiny.limit(5)
    i1, _, X1 = collect_vectors(mod.featurize(sample, ATTRS, dim=16))
    i2, _, X2 = collect_vectors(mod.featurize(sample, ATTRS, dim=16))
    o1, o2 = np.argsort(i1), np.argsort(i2)
    assert [i1[i] for i in o1] == [i2[i] for i in o2]
    assert np.allclose(X1[o1], X2[o2])


@pytest.mark.parametrize("name", sorted(MODULES))
def test_make_model_predicts_probabilities(spark, music_wide_tiny, name):
    mod = MODULES[name]
    fdf = mod.featurize(music_wide_tiny.limit(40), ATTRS, dim=16)
    _, y, X = collect_vectors(fdf)
    model = mod.make_model(X.shape[1], seed=0)
    model.epochs = 5
    model.fit(X, y)
    p = model.predict(X)
    assert ((p >= 0) & (p <= 1)).all()


def test_tler_is_logistic_regression():
    assert len(tler.make_model(10).Ws) == 1


def test_entitymatcher_alignment_symmetric_perfect():
    """Identical records align perfectly (global mean ~1, unmatched 0)."""
    from repro.baselines.entitymatcher import _aligned_stats
    from repro.text.embed import HashEmbedding

    emb = HashEmbedding(16)
    toks = [["hello", "world"], ["foo"]]
    means, mins, g, unmatched = _aligned_stats(toks, toks, emb)
    assert g == pytest.approx(1.0)
    assert unmatched == 0.0
    assert all(m == pytest.approx(1.0) for m in mins)


def test_entitymatcher_cross_attribute_alignment():
    """A token moved to a different attribute still aligns (the EM bias)."""
    from repro.baselines.entitymatcher import _aligned_stats
    from repro.text.embed import HashEmbedding

    emb = HashEmbedding(16)
    a = [["hello"], []]
    b = [[], ["hello"]]  # same token, different attribute slot
    means, mins, g, unmatched = _aligned_stats(a, b, emb)
    assert g == pytest.approx(1.0)


def test_ditto_idf_map(spark, music_wide_tiny):
    from repro.baselines.ditto import idf_map

    idf = idf_map(music_wide_tiny.limit(30), ATTRS)
    assert idf and all(v >= 0 for v in idf.values())


def test_ditto_rare_tokens_weigh_more(spark, music_wide_tiny):
    from repro.baselines.ditto import idf_map
    import collections

    sample = music_wide_tiny.limit(50)
    idf = idf_map(sample, ATTRS)
    counts = collections.Counter()
    for r in sample.collect():
        for a in ATTRS:
            for side in ("a_", "b_"):
                counts.update(set((r[side + a] or "").split()))
    common = counts.most_common(1)[0][0].lower()
    rare = min((t for t in idf), key=lambda t: counts.get(t, 0))
    assert idf[rare] >= idf.get(common, 0)


def test_cordel_uses_contrastive_split(spark, music_wide_tiny):
    """CorDel features of an identical pair: uni halves = missing vec."""
    import pandas as pd
    from repro.text.embed import missing_vector

    pdf = pd.DataFrame(
        {
            "pair_id": ["p"],
            "label": [1.0],
            **{f"a_{a}": ["same value"] for a in ATTRS},
            **{f"b_{a}": ["same value"] for a in ATTRS},
        }
    )
    df = spark.createDataFrame(pdf)
    _, _, X = collect_vectors(cordel.featurize(df, ATTRS, dim=16))
    X = X.reshape(len(ATTRS), 2, 16)
    mv = missing_vector(16)
    for j in range(len(ATTRS)):
        assert np.allclose(X[j, 1], mv)  # uni empty
