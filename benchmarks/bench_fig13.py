"""Fig. 13 regression bench: §6 rule pushdowns (R1, R2), original vs
rewritten plans."""
import os
import sys

import pytest
from pyspark.sql import functions as F

from repro import synth_data as sd
from repro.bench.harness import BENCH_SF
from repro.plan import Compare, Scan, lower, optimize_tree

from .conftest import bench_once

sys.path.insert(0, os.path.join(os.path.dirname(__file__), "..", "jobs"))
import fig13_rules as fig13  # noqa: E402


@pytest.fixture(scope="module")
def star_catalog(spark):
    ws = sd.websales(spark, sf=BENCH_SF).cache()
    ws.count()
    cat = {"websales": ws, "webpages": sd.webpages(spark)}
    yield cat
    ws.unpersist()


@pytest.fixture(scope="module")
def flight_catalog(spark):
    df = (
        sd.flights(spark, sf=BENCH_SF, n_airports=64)
        .withColumn("arr_delay_q", F.round("arr_delay", 0))
        .cache()
    )
    df.count()
    yield {"flights": df}
    df.unpersist()


@pytest.mark.parametrize("variant", ["original", "rewritten"])
@pytest.mark.parametrize("query", ["Q3", "Q4"])
def test_r1_phi_below_join(benchmark, star_catalog, query, variant):
    tree = fig13._r1_tree(query)
    if variant == "rewritten":
        tree = optimize_tree(tree)
    assert bench_once(benchmark, lambda: len(lower(tree, star_catalog).collect())) >= 1


@pytest.mark.parametrize("variant", ["original", "rewritten"])
@pytest.mark.parametrize("query", ["Q1", "Q2"])
def test_r2_dedup_below_phi(benchmark, flight_catalog, query, variant):
    cols = tuple(flight_catalog["flights"].columns)
    tree = Compare(Scan("flights", cols), fig13._r2_spec(query))
    if variant == "rewritten":
        tree = optimize_tree(tree)
    assert bench_once(benchmark, lambda: len(lower(tree, flight_catalog).collect())) >= 1
