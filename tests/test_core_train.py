"""Training-loop tests for the four AdaMEL variants."""
import numpy as np
import pytest

from repro.core.model import ModelConfig, attention, predict
from repro.core.train import Adam, TrainConfig, fit_adamel

F_, D = 4, 6
CFG = ModelConfig(n_features=F_, dim=D, h=4, hp=4, hh=8, seed=0)


def make_data(n=120, seed=0):
    """Separable toy task: feature 0 carries the label signal."""
    rng = np.random.default_rng(seed)
    y = rng.integers(0, 2, n).astype(float)
    H = rng.standard_normal((n, F_, D)) * 0.3
    H[:, 0, :] += np.where(y == 1.0, 1.0, -1.0)[:, None]
    return H, y


TRAIN = TrainConfig(epochs=30, batch_size=32, lr=5e-3, seed=0)


@pytest.fixture(scope="module")
def data():
    H, y = make_data()
    H_sup, y_sup = make_data(40, seed=1)
    H_tgt, _ = make_data(60, seed=2)
    return H, y, H_sup, y_sup, H_tgt


@pytest.mark.parametrize("variant", ["base", "zero", "few", "hyb"])
def test_variants_learn_separable_task(variant, data):
    H, y, H_sup, y_sup, H_tgt = data
    res = fit_adamel(variant, CFG, TRAIN, H, y, H_tgt=H_tgt, H_sup=H_sup, y_sup=y_sup)
    yhat = predict(res.params, H)
    acc = ((yhat > 0.5) == (y == 1.0)).mean()
    assert acc > 0.9, f"{variant}: train accuracy {acc}"


def test_base_loss_decreases(data):
    H, y, *_ = data
    res = fit_adamel("base", CFG, TRAIN, H, y)
    first = np.mean([h["base"] for h in res.history[:3]])
    last = np.mean([h["base"] for h in res.history[-3:]])
    assert last < first


def test_history_records_all_epochs(data):
    H, y, *_ = data
    res = fit_adamel("base", CFG, TRAIN, H, y)
    assert len(res.history) == TRAIN.epochs
    assert {"epoch", "base", "target", "support"} <= set(res.history[0])


def test_zero_requires_target(data):
    H, y, *_ = data
    with pytest.raises(ValueError, match="H_tgt"):
        fit_adamel("zero", CFG, TRAIN, H, y)


def test_few_requires_support(data):
    H, y, _, _, H_tgt = data
    with pytest.raises(ValueError, match="H_sup"):
        fit_adamel("few", CFG, TRAIN, H, y, H_tgt=H_tgt)


def test_unknown_variant_raises(data):
    H, y, *_ = data
    with pytest.raises(ValueError, match="variant"):
        fit_adamel("wat", CFG, TRAIN, H, y)


def test_deterministic_given_seed(data):
    H, y, *_ = data
    r1 = fit_adamel("base", CFG, TRAIN, H, y)
    r2 = fit_adamel("base", CFG, TRAIN, H, y)
    for k in r1.params:
        assert np.allclose(r1.params[k], r2.params[k])


def test_seed_changes_result(data):
    H, y, *_ = data
    r1 = fit_adamel("base", CFG, TRAIN, H, y)
    cfg2 = TrainConfig(**{**TRAIN.__dict__, "seed": 7})
    r2 = fit_adamel("base", ModelConfig(**{**CFG.__dict__, "seed": 7}), cfg2, H, y)
    assert not np.allclose(r1.params["V"], r2.params["V"])


def test_lambda_one_disables_supervision(data):
    """λ=1 ⇒ no labeled supervision during adaptation (Fig. 8 drop)."""
    H, y, _, _, H_tgt = data
    cfg = TrainConfig(**{**TRAIN.__dict__, "lam": 1.0, "warmup": 0.0})
    res = fit_adamel("zero", CFG, cfg, H, y, H_tgt=H_tgt)
    yhat = predict(res.params, H)
    acc = ((yhat > 0.5) == (y == 1.0)).mean()
    assert acc < 0.85  # supervised variants reach >0.9


def test_standardizer_stored_in_params(data):
    H, y, *_ = data
    res = fit_adamel("base", CFG, TRAIN, H, y)
    assert "mu" in res.params and "sd" in res.params
    assert res.params["mu"].shape == (F_ * D,)


def test_zero_uses_union_statistics(data):
    """zero's standardizer sees D_T; base's does not."""
    H, y, _, _, H_tgt = data
    r_base = fit_adamel("base", CFG, TRAIN, H, y)
    r_zero = fit_adamel("zero", CFG, TRAIN, H, y, H_tgt=H_tgt + 5.0)
    assert not np.allclose(r_base.params["mu"], r_zero.params["mu"])


def test_attention_sums_to_one_after_training(data):
    H, y, _, _, H_tgt = data
    res = fit_adamel("zero", CFG, TRAIN, H, y, H_tgt=H_tgt)
    g = attention(res.params, H_tgt)
    assert np.allclose(g.sum(axis=1), 1.0)


def test_class_balance_explicit_weight(data):
    H, y, *_ = data
    cfg = TrainConfig(**{**TRAIN.__dict__, "class_balance": 5.0})
    res = fit_adamel("base", CFG, cfg, H, y)
    acc = ((predict(res.params, H) > 0.5) == (y == 1.0)).mean()
    assert acc > 0.85


def test_adam_moves_parameters():
    params = {"w": np.zeros(3)}
    opt = Adam(params, lr=0.1)
    opt.step(params, {"w": np.ones(3)})
    assert (params["w"] < 0).all()


def test_adam_step_magnitude_bounded_by_lr():
    params = {"w": np.zeros(3)}
    opt = Adam(params, lr=0.1)
    opt.step(params, {"w": np.array([1e6, 1.0, 1e-12])})
    assert np.abs(params["w"]).max() <= 0.1 + 1e-9
