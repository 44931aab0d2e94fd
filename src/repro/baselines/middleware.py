"""Middleware baseline (paper §8 setup; mimics Zenvisage/SeeDB).

The middleware issues one select-aggregate query per (side, g, m),
ships the aggregate result over the network to a client process, and
compares trends client-side (with the trendwise + summary-pruning
optimizations, as in the paper). The network is simulated: the Arrow
payload is actually serialized, a transfer delay of
``bytes / bandwidth`` is injected (the paper measured a 10 MB/s link),
and the payload is actually deserialized — reproducing the transfer +
(de)serialization bottleneck the paper attributes to this approach.
``bandwidth_mbps=None`` disables the sleep (used by correctness tests).
"""
from __future__ import annotations

import pickle
import time

import pandas as pd
from pyspark.sql import DataFrame

from repro.core.aggregates import G_COL, V_COL, build_side_aggregates, same_grouping_groups
from repro.core.spec import CompareSpec, output_cols

from . import client_core as cc


def _fetch(rel: DataFrame, bandwidth_mbps: float | None) -> tuple[pd.DataFrame, int]:
    """Collect an aggregate query result and simulate its network hop."""
    pdf = rel.toPandas()
    payload = pickle.dumps(pdf, protocol=pickle.HIGHEST_PROTOCOL)
    if bandwidth_mbps:
        time.sleep(len(payload) / (bandwidth_mbps * 1_000_000))
    return pickle.loads(payload), len(payload)


def compare_middleware(
    df: DataFrame,
    spec: CompareSpec,
    *,
    k: int | None = None,
    ascending: bool = True,
    bandwidth_mbps: float | None = 10.0,
    return_bytes: bool = False,
):
    """COMPARE computed in a middleware client. Returns a pandas frame
    (the result lives client-side), optionally with total bytes moved."""
    rels = build_side_aggregates(
        df, spec, same_grouping_groups(spec.gms), share_sides=True, persist_merged=False
    )
    total_bytes = 0
    fetched: dict[int, pd.DataFrame] = {}
    per_gm = []
    for gi, gm in enumerate(spec.gms):
        r1, r2 = rels[(1, gm)], rels[(2, gm)]
        p2, b2 = _fetch(r2, bandwidth_mbps)
        total_bytes += b2
        if r1 is r2:
            p1 = p2
        else:
            p1, b1 = _fetch(r1, bandwidth_mbps)
            total_bytes += b1
        t1 = cc.group_trends(p1, spec.t1.vary_cols, G_COL, V_COL)
        t2 = cc.group_trends(p2, spec.t2.vary_cols, G_COL, V_COL)
        per_gm.append((t1, t2))
    if k is None:
        rows = []
        for gi, (t1, t2) in enumerate(per_gm):
            rows.extend(cc.score_all_pairs(spec, t1, t2, gi))
    else:
        rows = cc.topk_pairs(spec, per_gm, k, ascending)
    out = cc.rows_to_frame(spec, rows, output_cols(spec))
    return (out, total_bytes) if return_bytes else out
