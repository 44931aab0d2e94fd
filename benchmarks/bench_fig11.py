"""Fig. 11 regression bench: latency vs number of segment aggregates.

The Sturges choice should sit near the bottom of the U-curve.
"""
import pytest

from repro.bench.workloads import flight_queries
from repro.core.pruning import compare_topk_pruned

from .conftest import bench_once


@pytest.mark.parametrize("n_segments", [1, 4, 9, 32])
def test_segments_q2(benchmark, flight_bench, n_segments):
    wl = flight_queries()["Q2"]

    def go():
        return len(
            compare_topk_pruned(
                flight_bench, wl.spec, wl.k, ascending=wl.ascending, n_segments=n_segments
            ).collect()
        )

    assert bench_once(benchmark, go) >= 1


def test_segments_sturges_default(benchmark, flight_bench):
    wl = flight_queries()["Q2"]

    def go():
        return len(
            compare_topk_pruned(flight_bench, wl.spec, wl.k, ascending=wl.ascending).collect()
        )

    assert bench_once(benchmark, go) >= 1
