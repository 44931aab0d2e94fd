"""Fig. 10 regression bench: sensitivity to #trends and #(g, m)."""
import pytest

from repro import synth_data as sd
from repro.bench.harness import BENCH_SF, execute
from repro.bench.workloads import Workload, flight_gms, flight_queries
from repro.core.spec import CompareSpec, ConstraintTerm, Scorer, TrendsetSpec

from .conftest import bench_once


@pytest.fixture(scope="module")
def dfs(spark):
    cache = {}
    for n in (16, 64):
        d = sd.flights(spark, sf=BENCH_SF, n_airports=n).cache()
        d.count()
        cache[n] = d
    yield cache
    for d in cache.values():
        d.unpersist()


@pytest.mark.parametrize("n_trends", [16, 64])
@pytest.mark.parametrize("method", ["naive_sql", "compare"])
def test_scale_trends(benchmark, dfs, n_trends, method):
    wl = flight_queries()["Q2"]
    assert bench_once(benchmark, execute, method, dfs[n_trends], wl) >= 1


@pytest.mark.parametrize("n_gms", [1, 10])
@pytest.mark.parametrize("method", ["naive_sql", "compare"])
def test_scale_gms(benchmark, dfs, n_gms, method):
    spec = CompareSpec(
        TrendsetSpec((ConstraintTerm("airport", "A0"),)),
        TrendsetSpec((ConstraintTerm("airport", "A1"),)),
        flight_gms(n_gms),
        Scorer("SUM", 2),
    )
    wl = Workload(f"gms{n_gms}", "flight", spec, fds={"week": "day", "month": "day"})
    assert bench_once(benchmark, execute, method, dfs[16], wl) >= 1
