"""Fig. 9b regression bench: the optimization ablation ladder.

basic → merged → trendwise → pruned → compare (full system): each rung
should not be slower than the previous on the many-pair queries.
"""
import pytest

from repro.bench.harness import execute
from repro.bench.workloads import flight_queries

from .conftest import bench_once

LEVELS = ("basic", "merged", "trendwise", "pruned", "compare")


@pytest.mark.parametrize("level", LEVELS)
@pytest.mark.parametrize("query", ["Q2", "Q4"])
def test_ablation(benchmark, flight_bench, query, level):
    wl = flight_queries()[query]
    assert bench_once(benchmark, execute, level, flight_bench, wl) >= 1
