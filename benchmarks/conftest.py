"""Benchmark-local fixtures (the Spark session comes from the root conftest)."""
import pytest


@pytest.fixture(scope="session")
def bench_seeds():
    """Benchmarks run single-seed to bound wall time (jobs use 3 seeds)."""
    return 1
