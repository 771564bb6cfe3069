"""End-to-end harness + scenario integration tests (tiny scale)."""
import numpy as np
import pytest

from repro.experiments.harness import (
    ADAMEL_METHODS,
    ALL_METHODS,
    BASELINE_MODULES,
    run_adamel,
    run_method,
    evaluate_methods,
)
from repro.metrics import pr_auc


def test_method_registry_complete():
    assert set(ALL_METHODS) == set(BASELINE_MODULES) | set(ADAMEL_METHODS)
    assert len(ALL_METHODS) == 9  # the paper's Table 8/9 method count


def test_scenario_split_sizes(music_scenario_tiny):
    """Requested sizes are upper bounds; pools must fill most of them."""
    assert 120 <= music_scenario_tiny.train.count() <= 180
    assert 30 <= music_scenario_tiny.support.count() <= 50
    assert 120 <= music_scenario_tiny.test.count() <= 180


def test_adamel_data_cached(music_scenario_tiny):
    d1 = music_scenario_tiny.adamel_data()
    d2 = music_scenario_tiny.adamel_data()
    assert d1 is d2


def test_baseline_data_cached(music_scenario_tiny):
    d1 = music_scenario_tiny.baseline_data("TLER")
    d2 = music_scenario_tiny.baseline_data("TLER")
    assert d1 is d2


def test_run_adamel_outputs(music_scenario_tiny, fast_train_cfg):
    r = run_adamel(music_scenario_tiny, "AdaMEL-base", seed=0, train_cfg=fast_train_cfg)
    assert r["scores"].shape == r["y"].shape
    assert ((r["scores"] >= 0) & (r["scores"] <= 1)).all()
    assert r["attention_target"].shape == (18,)
    assert r["attention_target"].sum() == pytest.approx(1.0)
    assert len(r["feature_names"]) == 18


@pytest.mark.parametrize("method", sorted(BASELINE_MODULES))
def test_run_baseline_all(music_scenario_tiny, method):
    r = run_method(music_scenario_tiny, method, seed=0)
    assert r["scores"].shape == r["y"].shape
    assert pr_auc(r["y"], r["scores"]) > 0.3  # far above the base rate


@pytest.mark.parametrize("variant", ADAMEL_METHODS)
def test_run_adamel_all_variants(music_scenario_tiny, fast_train_cfg, variant):
    r = run_adamel(music_scenario_tiny, variant, seed=0, train_cfg=fast_train_cfg)
    assert pr_auc(r["y"], r["scores"]) > 0.4


def test_run_method_unknown(music_scenario_tiny):
    with pytest.raises(ValueError):
        run_method(music_scenario_tiny, "GPT-matcher")


def test_evaluate_methods_shapes(music_scenario_tiny, fast_train_cfg):
    res = evaluate_methods(
        music_scenario_tiny, ["TLER", "AdaMEL-base"], n_seeds=2, train_cfg=fast_train_cfg
    )
    assert set(res) == {"TLER", "AdaMEL-base"}
    for mean, std in res.values():
        assert 0.0 <= mean <= 1.0 and std >= 0.0


def test_adamel_beats_chance_on_shifted_test(music_scenario_tiny, fast_train_cfg):
    r = run_adamel(music_scenario_tiny, "AdaMEL-hyb", seed=0, train_cfg=fast_train_cfg)
    base_rate = r["y"].mean()
    assert pr_auc(r["y"], r["scores"]) > base_rate + 0.2


def test_deterministic_across_runs(music_scenario_tiny, fast_train_cfg):
    r1 = run_adamel(music_scenario_tiny, "AdaMEL-base", seed=0, train_cfg=fast_train_cfg)
    r2 = run_adamel(music_scenario_tiny, "AdaMEL-base", seed=0, train_cfg=fast_train_cfg)
    assert np.allclose(r1["scores"], r2["scores"])
