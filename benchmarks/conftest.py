"""Benchmark fixtures: SF≈0.05 cached datasets (override REPRO_BENCH_SF).

Each benchmark runs one round (Spark jobs are seconds-long; statistical
repetition is wasteful here) and releases persisted aggregates after.
"""
import pytest

from repro.bench.harness import BENCH_SF, drop_datasets, get_dataset
from repro.core.aggregates import clear_cache


@pytest.fixture(scope="session")
def flight_bench(spark):
    yield get_dataset(spark, "flight", BENCH_SF)


@pytest.fixture(scope="session")
def tpcds_bench(spark):
    yield get_dataset(spark, "tpcds", BENCH_SF)


@pytest.fixture(scope="session", autouse=True)
def _cleanup_session(spark):
    # depends on `spark` so datasets unpersist before the session stops
    from repro.bench.harness import tune_session

    tune_session(spark)
    yield
    drop_datasets()


@pytest.fixture(autouse=True)
def _cleanup_test():
    yield
    clear_cache()


def bench_once(benchmark, fn, *args, **kw):
    """One timed round; pytest-benchmark still records it per test."""
    return benchmark.pedantic(fn, args=args, kwargs=kw, rounds=1, iterations=1)
