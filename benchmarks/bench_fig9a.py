"""Fig. 9a regression bench: end-to-end top-k latency per method.

COMPARE should beat naive_sql on every query; the gap should widen
from Q1 to Q2/Q4 (more trends / more (g, m) combinations).
"""
import pytest

from repro.bench.harness import execute
from repro.bench.workloads import flight_queries, tpcds_queries

from .conftest import bench_once

METHODS = ("naive_sql", "udf", "middleware", "compare")


@pytest.mark.parametrize("method", METHODS)
@pytest.mark.parametrize("query", ["Q1", "Q2", "Q4"])
def test_flight(benchmark, flight_bench, query, method):
    wl = flight_queries()[query]
    kw = {"bandwidth_mbps": None} if method == "middleware" else {}
    assert bench_once(benchmark, execute, method, flight_bench, wl, **kw) >= 1


@pytest.mark.parametrize("method", METHODS)
@pytest.mark.parametrize("query", ["Q1", "Q4"])
def test_tpcds(benchmark, tpcds_bench, query, method):
    wl = tpcds_queries()[query]
    kw = {"bandwidth_mbps": None} if method == "middleware" else {}
    assert bench_once(benchmark, execute, method, tpcds_bench, wl, **kw) >= 1
