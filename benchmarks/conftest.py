"""Benchmark fixtures: cities at BENCH scale (SF=0.1, N=32x32)."""
import pytest

from repro.experiments.config import BENCH, load_city


@pytest.fixture(scope="session")
def bench_nyc(spark):
    return load_city(spark, "nyc", BENCH)


@pytest.fixture(scope="session")
def bench_chengdu(spark):
    return load_city(spark, "chengdu", BENCH)


@pytest.fixture(scope="session")
def bench_xian(spark):
    return load_city(spark, "xian", BENCH)
