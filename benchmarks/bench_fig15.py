"""Fig. 15 regression bench: DOP sweep for COMPARE vs naive SQL on Q1."""
import pytest

from repro.bench.harness import execute
from repro.bench.workloads import flight_queries

from .conftest import bench_once


@pytest.mark.parametrize("dop", [2, 8, 16])
@pytest.mark.parametrize("method", ["naive_sql", "compare"])
def test_dop_sweep(benchmark, spark, flight_bench, dop, method):
    wl = flight_queries()["Q1"]
    original = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", str(dop))
    df = flight_bench.repartition(dop).cache()
    df.count()
    try:
        assert bench_once(benchmark, execute, method, df, wl) >= 1
    finally:
        df.unpersist()
        spark.conf.set("spark.sql.shuffle.partitions", original)
