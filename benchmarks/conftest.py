"""Benchmark-local fixtures: warm the Spark session once before timing."""
import pytest

from repro.tables import warmup


@pytest.fixture(scope="session", autouse=True)
def _warm_spark(spark):
    warmup(spark)
