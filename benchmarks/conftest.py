"""Session fixtures for the benchmark suite: one statistics-history
extraction per dataset (cached on disk by repro.sim.data), shared by the
per-table benchmarks."""
import pytest

from repro.sim.data import load_dataset


@pytest.fixture(scope="session")
def traffic_bundle(spark):
    return load_dataset(spark, "traffic")


@pytest.fixture(scope="session")
def stocks_bundle(spark):
    return load_dataset(spark, "stocks")
