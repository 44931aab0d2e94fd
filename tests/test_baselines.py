"""The three §8 baselines must produce the same results as COMPARE:
verbose-SQL-through-Catalyst, sequential UDF, and middleware client."""
import pandas as pd
import pytest

from repro.baselines.middleware import compare_middleware
from repro.baselines.naive_sql import compare_naive_sql, compare_topk_naive_sql
from repro.baselines.udf import compare_udf
from repro.core.aggregates import clear_cache
from repro.core.compare import compare, compare_topk, topk_exact

from .conftest import check_against_oracle
from .spec_catalog import CATALOG, fixture_for

BASELINE_SPECS = ["ex1a", "ex2a", "q1", "q2", "q3", "q4", "tpcds_q1", "avg_scorer", "manhattan"]


@pytest.fixture(autouse=True)
def _release_persisted():
    yield
    clear_cache()


@pytest.mark.parametrize("name", BASELINE_SPECS)
def test_naive_sql_matches_oracle(request, name):
    dataset, spec = CATALOG[name]
    df = request.getfixturevalue(fixture_for(dataset))
    check_against_oracle(compare_naive_sql(df, spec), spec, df)


@pytest.mark.parametrize("name", BASELINE_SPECS)
def test_udf_matches_oracle(request, name):
    dataset, spec = CATALOG[name]
    df = request.getfixturevalue(fixture_for(dataset))
    check_against_oracle(compare_udf(df, spec), spec, df)


@pytest.mark.parametrize("name", BASELINE_SPECS)
def test_middleware_matches_compare(request, name):
    dataset, spec = CATALOG[name]
    df = request.getfixturevalue(fixture_for(dataset))
    client = compare_middleware(df, spec, bandwidth_mbps=None)
    engine = compare(df, spec, strategy="trendwise").toPandas()
    key = [c for c in engine.columns if c != "score"]
    a = client.sort_values(key).reset_index(drop=True)
    b = engine.sort_values(key).reset_index(drop=True)
    assert len(a) == len(b)
    pd.testing.assert_frame_equal(
        a[key].astype(str), b[key].astype(str), check_dtype=False
    )
    assert a["score"].round(5).tolist() == pytest.approx(b["score"].round(5).tolist())


@pytest.mark.parametrize("name", ["q2", "q4"])
@pytest.mark.parametrize("ascending", [True, False])
def test_udf_topk_matches_exact(request, name, ascending):
    dataset, spec = CATALOG[name]
    df = request.getfixturevalue(fixture_for(dataset))
    got = compare_udf(df, spec, k=3, ascending=ascending).toPandas()
    exp = topk_exact(compare(df, spec, "trendwise"), 3, ascending).toPandas()
    assert sorted(got["score"].round(6)) == pytest.approx(sorted(exp["score"].round(6)))


@pytest.mark.parametrize("name", ["q2", "q4"])
def test_middleware_topk_matches_exact(request, name):
    dataset, spec = CATALOG[name]
    df = request.getfixturevalue(fixture_for(dataset))
    got = compare_middleware(df, spec, k=3, ascending=True, bandwidth_mbps=None)
    exp = topk_exact(compare(df, spec, "trendwise"), 3, True).toPandas()
    assert sorted(got["score"].round(6)) == pytest.approx(sorted(exp["score"].round(6)))


def test_naive_sql_topk_matches_compare_topk(request, flight_df):
    _, spec = CATALOG["q2"]
    a = compare_topk_naive_sql(flight_df, spec, 3, True).toPandas()
    b = compare_topk(flight_df, spec, 3, ascending=True, strategy="compare").toPandas()
    assert sorted(a["score"].round(6)) == pytest.approx(sorted(b["score"].round(6)))


def test_middleware_reports_bytes(request, flight_df):
    _, spec = CATALOG["q1"]
    _, nbytes = compare_middleware(
        flight_df, spec, bandwidth_mbps=None, return_bytes=True
    )
    assert nbytes > 0


def test_middleware_bandwidth_slows_transfer(request, flight_df):
    import time

    _, spec = CATALOG["q1"]
    t0 = time.perf_counter()
    _, nbytes = compare_middleware(
        flight_df, spec, bandwidth_mbps=None, return_bytes=True
    )
    fast = time.perf_counter() - t0
    slow_bw = max(0.05, nbytes / 1_000_000 / 2)  # ≥2s of simulated transfer
    t0 = time.perf_counter()
    compare_middleware(flight_df, spec, bandwidth_mbps=slow_bw)
    slow = time.perf_counter() - t0
    assert slow > fast
