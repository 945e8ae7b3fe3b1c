"""Shared fixtures: tiny benchmark KGs reused across the test session."""
import pytest

from repro.kgdata import make_benchmark


@pytest.fixture(scope="session")
def unit_kg(spark):
    """The 300-pair unit benchmark (no unknown entities)."""
    return make_benchmark(spark, "unit", "en-fr", seed=7)


@pytest.fixture(scope="session")
def unitk_kg(spark):
    """The unit benchmark variant with unknown entities (dbp1m-style)."""
    return make_benchmark(spark, "unitk", "en-fr", seed=7)
