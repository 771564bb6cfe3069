"""Unit + property tests for repro.metrics (PRAUC, F1)."""
import numpy as np
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.metrics import best_f1, f1_at, pr_auc


def brute_force_ap(y, s):
    """Reference AP: sum over positives of precision@rank (ties grouped
    the sklearn way via threshold steps)."""
    y, s = np.asarray(y, float), np.asarray(s, float)
    out, prev_r = 0.0, 0.0
    n_pos = y.sum()
    for t in sorted(set(s), reverse=True):
        mask = s >= t
        tp = y[mask].sum()
        p = tp / mask.sum()
        r = tp / n_pos
        out += (r - prev_r) * p
        prev_r = r
    return out


def test_perfect_ranking():
    assert pr_auc([1, 1, 0, 0], [0.9, 0.8, 0.2, 0.1]) == pytest.approx(1.0)


def test_worst_ranking():
    # 2 pos at the bottom of 4: AP = 0*... precision at recall steps
    assert pr_auc([1, 1, 0, 0], [0.1, 0.2, 0.8, 0.9]) == pytest.approx(
        brute_force_ap([1, 1, 0, 0], [0.1, 0.2, 0.8, 0.9])
    )


def test_random_mid_case():
    y = [1, 0, 1, 0, 0]
    s = [0.9, 0.8, 0.7, 0.6, 0.5]
    # ranks: pos@1 (p=1), pos@3 (p=2/3) -> AP = .5*1 + .5*(2/3)
    assert pr_auc(y, s) == pytest.approx(0.5 * 1 + 0.5 * (2 / 3))


def test_all_tied_scores():
    y = [1, 0, 1, 0]
    s = [0.5, 0.5, 0.5, 0.5]
    assert pr_auc(y, s) == pytest.approx(0.5)  # single threshold: p=0.5, r=1


def test_no_positives_returns_zero():
    assert pr_auc([0, 0, 0], [0.1, 0.2, 0.3]) == 0.0


def test_all_positives_is_one():
    assert pr_auc([1, 1], [0.3, 0.9]) == pytest.approx(1.0)


def test_single_example():
    assert pr_auc([1], [0.7]) == pytest.approx(1.0)


@pytest.mark.parametrize("n", [2, 5, 20])
def test_matches_brute_force_random(n):
    rng = np.random.default_rng(n)
    for _ in range(20):
        y = rng.integers(0, 2, n)
        if y.sum() == 0:
            y[0] = 1
        s = rng.random(n).round(1)  # force ties
        assert pr_auc(y, s) == pytest.approx(brute_force_ap(y, s))


@given(
    st.lists(
        st.tuples(st.integers(0, 1), st.integers(0, 5)), min_size=1, max_size=30
    )
)
def test_prauc_property_vs_brute_force(pairs):
    y = [p[0] for p in pairs]
    s = [p[1] / 5 for p in pairs]
    if sum(y) == 0:
        assert pr_auc(y, s) == 0.0
    else:
        assert pr_auc(y, s) == pytest.approx(brute_force_ap(y, s))


@given(st.lists(st.tuples(st.integers(0, 1), st.floats(0, 1)), min_size=1, max_size=30))
def test_prauc_bounds(pairs):
    y = [p[0] for p in pairs]
    s = [p[1] for p in pairs]
    v = pr_auc(y, s)
    assert 0.0 <= v <= 1.0 + 1e-9


def test_prauc_invariant_to_monotone_transform():
    y = [1, 0, 1, 0, 1]
    s = np.array([0.9, 0.5, 0.4, 0.3, 0.2])
    assert pr_auc(y, s) == pytest.approx(pr_auc(y, s * 10 - 3))


def test_shape_mismatch_raises():
    with pytest.raises(ValueError):
        pr_auc([1, 0], [0.5])


def test_empty_raises():
    with pytest.raises(ValueError):
        pr_auc([], [])


def test_nonbinary_raises():
    with pytest.raises(ValueError):
        pr_auc([0, 2], [0.1, 0.2])


# ----------------------------------------------------------------- F1

def test_f1_perfect():
    assert f1_at([1, 1, 0], [0.9, 0.8, 0.1]) == pytest.approx(1.0)


def test_f1_half():
    # pred: [1,0]; truth [1,1] -> tp=1 fn=1 fp=0 -> p=1, r=.5 -> f1=2/3
    assert f1_at([1, 1], [0.9, 0.1]) == pytest.approx(2 / 3)


def test_f1_no_predictions():
    assert f1_at([1, 0], [0.1, 0.2]) == 0.0


def test_f1_threshold_respected():
    assert f1_at([1, 0], [0.6, 0.4], threshold=0.5) == pytest.approx(1.0)
    assert f1_at([1, 0], [0.6, 0.4], threshold=0.7) == 0.0


def test_best_f1_geq_f1_at_half():
    rng = np.random.default_rng(0)
    y = rng.integers(0, 2, 50)
    s = rng.random(50)
    assert best_f1(y, s) >= f1_at(y, s) - 1e-12


def test_best_f1_perfect_separation():
    assert best_f1([0, 1, 0, 1], [0.1, 0.9, 0.2, 0.8]) == pytest.approx(1.0)


def test_best_f1_no_positives():
    assert best_f1([0, 0], [0.5, 0.6]) == 0.0
