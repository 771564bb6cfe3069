"""Unit tests for the AdaMEL loss functions."""
import numpy as np
import pytest

from repro.core.losses import (
    bce,
    class_centroids,
    kl_target,
    support_weights,
    weighted_bce,
)


def test_bce_perfect_predictions_near_zero():
    loss, _ = bce(np.array([0.999999, 0.000001]), np.array([1.0, 0.0]))
    assert loss < 1e-4


def test_bce_half_is_log2():
    loss, _ = bce(np.array([0.5, 0.5]), np.array([1.0, 0.0]))
    assert loss == pytest.approx(np.log(2))


def test_bce_dlogit_sign():
    _, d = bce(np.array([0.9, 0.1]), np.array([0.0, 1.0]))
    assert d[0] > 0 and d[1] < 0  # push logit down / up


def test_bce_dlogit_is_mean_scaled():
    yhat, y = np.array([0.7, 0.3, 0.5]), np.array([1.0, 0.0, 1.0])
    _, d = bce(yhat, y)
    assert np.allclose(d, (yhat - y) / 3)


def test_bce_pos_weight_scales_positive_terms():
    yhat, y = np.array([0.5, 0.5]), np.array([1.0, 0.0])
    l1, d1 = bce(yhat, y, pos_weight=1.0)
    l3, d3 = bce(yhat, y, pos_weight=3.0)
    assert l3 == pytest.approx((3 * np.log(2) + np.log(2)) / 2)
    assert d3[0] == pytest.approx(3 * d1[0])
    assert d3[1] == pytest.approx(d1[1])


def test_bce_clips_extreme_predictions():
    loss, _ = bce(np.array([0.0, 1.0]), np.array([1.0, 0.0]))
    assert np.isfinite(loss)


def test_kl_zero_when_distributions_match():
    g = np.tile([0.5, 0.3, 0.2], (4, 1))
    loss, _ = kl_target(g, np.array([0.5, 0.3, 0.2]))
    assert loss == pytest.approx(0.0, abs=1e-9)


def test_kl_positive_when_different():
    g = np.tile([0.9, 0.05, 0.05], (4, 1))
    loss, _ = kl_target(g, np.array([0.2, 0.4, 0.4]))
    assert loss > 0


def test_kl_gradient_pulls_toward_target():
    """∂KL/∂g is most negative where the target wants more mass."""
    g = np.tile([0.8, 0.1, 0.1], (2, 1))
    _, dg = kl_target(g, np.array([0.1, 0.45, 0.45]))
    assert dg[0, 1] < dg[0, 0] and dg[0, 2] < dg[0, 0]


def test_kl_per_pair_reduces_to_mean_for_constant_g():
    g = np.tile([0.6, 0.4], (5, 1))
    fbar = np.array([0.3, 0.7])
    l_mean, _ = kl_target(g, fbar)
    l_pair, _ = kl_target(g, fbar, per_pair=True)
    assert l_mean == pytest.approx(l_pair)


def test_kl_per_pair_penalizes_dispersion_more():
    """Jensen: mean-of-KL >= KL-of-mean over dispersed attentions."""
    g = np.array([[0.9, 0.1], [0.1, 0.9]])
    fbar = np.array([0.5, 0.5])
    l_pair, _ = kl_target(g, fbar, per_pair=True)
    l_mean, _ = kl_target(g, fbar)
    assert l_pair > l_mean
    assert l_mean == pytest.approx(0.0, abs=1e-9)  # batch mean already matches


def test_kl_handles_zero_attention_safely():
    g = np.array([[1.0, 0.0]])
    loss, dg = kl_target(g, np.array([0.5, 0.5]), per_pair=True)
    assert np.isfinite(loss) and np.isfinite(dg).all()


def test_class_centroids_values():
    g = np.array([[0.8, 0.2], [0.6, 0.4], [0.2, 0.8], [0.4, 0.6]])
    y = np.array([1.0, 1.0, 0.0, 0.0])
    c = class_centroids(g, y)
    assert np.allclose(c["c_pos"], [0.7, 0.3])
    assert np.allclose(c["c_neg"], [0.3, 0.7])
    assert c["dbar_pos"] == pytest.approx(np.linalg.norm([0.1, -0.1]))
    assert c["dbar_neg"] == pytest.approx(np.linalg.norm([0.1, -0.1]))


def test_class_centroids_missing_class_fallback():
    g = np.array([[0.5, 0.5]])
    c = class_centroids(g, np.array([1.0]))
    assert np.isfinite(c["c_neg"]).all() and c["dbar_neg"] > 0


def test_support_weights_deviating_pairs_weigh_more():
    g = np.array([[0.7, 0.3], [0.2, 0.8]])
    y = np.array([1.0, 1.0])
    cents = {
        "c_pos": np.array([0.7, 0.3]),
        "c_neg": np.array([0.5, 0.5]),
        "dbar_pos": 0.1,
        "dbar_neg": 0.1,
    }
    w = support_weights(g, y, cents)
    assert w[0] == pytest.approx(0.0)
    assert w[1] > 1.0  # far from centroid, normalized by d̄


def test_support_weights_use_class_specific_centroid():
    g = np.array([[0.9, 0.1], [0.9, 0.1]])
    y = np.array([1.0, 0.0])
    cents = {
        "c_pos": np.array([0.9, 0.1]),
        "c_neg": np.array([0.1, 0.9]),
        "dbar_pos": 1.0,
        "dbar_neg": 1.0,
    }
    w = support_weights(g, y, cents)
    assert w[0] == pytest.approx(0.0)
    assert w[1] > 0


def test_weighted_bce_reduces_to_bce_with_unit_weights():
    yhat, y = np.array([0.7, 0.2]), np.array([1.0, 0.0])
    l0, d0 = bce(yhat, y)
    l1, d1 = weighted_bce(yhat, y, np.ones(2))
    assert l0 == pytest.approx(l1)
    assert np.allclose(d0, d1)


def test_weighted_bce_scales_per_example():
    yhat, y = np.array([0.5, 0.5]), np.array([1.0, 0.0])
    _, d = weighted_bce(yhat, y, np.array([2.0, 1.0]))
    assert d[0] == pytest.approx(2 * (0.5 - 1.0) / 2)
    assert d[1] == pytest.approx(1 * (0.5 - 0.0) / 2)
