"""Fig. 14: physical-design ("index") impact.

Spark has no secondary indexes; the closest physical-design knob is a
column-pruned input, hash-partitioned by the trend column and sorted
within partitions on the grouping column, cached — mirroring what the
paper's non-clustered covering indexes buy (less IO/CPU before the
compare). Reports COMPARE's speedup over naive SQL with and without
that design.
"""
import _common

from repro import synth_data as sd
from repro.bench.harness import execute, timed
from repro.bench.workloads import flight_queries


def _plain(spark, sf):
    df = sd.flights(spark, sf=sf, n_airports=64).cache()
    df.count()
    return df


def _indexed(spark, sf, cols):
    df = (
        sd.flights(spark, sf=sf, n_airports=64)
        .select(*cols)
        .repartition("airport")
        .sortWithinPartitions("airport", "day")
        .cache()
    )
    df.count()
    return df


def run(spark, sf=0.05, queries=("Q1", "Q2")):
    rows = []
    wls = flight_queries()
    for q in queries:
        wl = wls[q]
        for design, df in (
            ("heap", _plain(spark, sf)),
            ("indexed", _indexed(spark, sf, list(wl.spec.input_cols))),
        ):
            base = timed(execute, "naive_sql", df, wl)
            t = timed(execute, "compare", df, wl)
            rows.append({"query": q, "design": design,
                         "naive_s": round(base, 3), "compare_s": round(t, 3),
                         "speedup_x": round(base / t, 2)})
            df.unpersist()
    return rows


if __name__ == "__main__":
    _common.main_wrapper("fig14_physical_design", run)
