"""Shared tiny-scale Spark fixtures for the test suite.

Everything here is session-scoped and small (tens of entities) so the
full suite stays minutes, not hours. The ``spark`` fixture itself comes
from the repo-root conftest.
"""
import pytest


@pytest.fixture(scope="session")
def music_records_tiny(spark):
    from repro.datagen.music import music_records

    return music_records(spark, n_per_type=40, seed=0).cache()


@pytest.fixture(scope="session")
def monitor_records_tiny(spark):
    from repro.datagen.monitor import monitor_records

    return monitor_records(spark, n_entities=60, seed=0).cache()


@pytest.fixture(scope="session")
def music_wide_tiny(spark, music_records_tiny):
    from repro.datagen.music import ATTRS
    from repro.experiments.scenarios import candidate_pairs
    from repro.pairs.assemble import assemble_pairs

    cands = candidate_pairs(music_records_tiny, "name", seed=0)
    return assemble_pairs(cands, music_records_tiny, ATTRS).cache()


@pytest.fixture(scope="session")
def music_scenario_tiny(spark):
    """A small but trainable artist scenario shared by integration tests."""
    from repro.experiments.scenarios import music_scenario
    from repro.pairs.splits import SplitSizes

    sizes = SplitSizes(
        train_pos=60, train_neg=120, support_pos=25, support_neg=25,
        test_pos=60, test_neg=120,
    )
    return music_scenario(spark, "artist", "overlap", n_per_type=120, seed=0, sizes=sizes)


@pytest.fixture(scope="session")
def fast_train_cfg():
    from repro.core.train import TrainConfig

    return TrainConfig(epochs=30, batch_size=64, lr=3e-3, seed=0)
