"""Fig. 12 regression bench: tuples processed per update during early
termination (too few → PQ thrash; too many → wasted comparisons)."""
import math

import pytest

from repro.bench.workloads import flight_queries
from repro.core.pruning import compare_topk_pruned

from .conftest import bench_once


@pytest.mark.parametrize("tpu", [1, 10, 100, 2000])
def test_tuples_per_update_q2(benchmark, flight_bench, tpu):
    wl = flight_queries()["Q2"]

    def go():
        return len(
            compare_topk_pruned(
                flight_bench, wl.spec, wl.k, ascending=wl.ascending, tuples_per_update=tpu
            ).collect()
        )

    assert bench_once(benchmark, go) >= 1


def test_auto_segment_size(benchmark, flight_bench):
    """COMPARE's automatic choice: one segment's worth of tuples."""
    wl = flight_queries()["Q2"]
    n_days = flight_bench.select("day").distinct().count()
    auto = max(1, n_days // int(1 + math.log2(n_days)))

    def go():
        return len(
            compare_topk_pruned(
                flight_bench, wl.spec, wl.k, ascending=wl.ascending, tuples_per_update=auto
            ).collect()
        )

    assert bench_once(benchmark, go) >= 1
