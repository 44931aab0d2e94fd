"""Tables 4–5 regression bench: workload enumeration and dataset
generation/scan at bench scale."""
from repro.bench.harness import BENCH_SF

from .conftest import bench_once


def test_table4_enumeration(benchmark):
    import os
    import sys

    sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "jobs"))
    import table4_workloads as j

    rows = bench_once(benchmark, j.run)
    assert len(rows) == 8


def test_table5_dataset_scan(benchmark, spark):
    import os
    import sys

    sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "jobs"))
    import table5_datasets as j
    from repro.bench.harness import drop_datasets

    rows = bench_once(benchmark, j.run, spark, sf=min(BENCH_SF, 0.02))
    drop_datasets()
    assert len(rows) == 2
