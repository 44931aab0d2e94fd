"""Trendwise COMPARE execution via partitioning (paper §4.2).

Instead of one join between two trendset relations (cost superlinear in
trendset size), the aggregate output is partitioned per trend — here:
collapsed to one row per trend holding its sorted (grouping, value)
vectors — and the join happens at *trend* granularity (p rows, not n
tuples). Each surviving pair is scored inside an Arrow-backed
``mapInPandas`` kernel, Spark's analogue of the paper's parallel
partition-wise join + UDA (steps 3–7 of the merged sub-plan).

Execution is organized per :class:`~repro.core.aggregates.VectorBlock`
(all measures sharing a grouping column): one aggregation, one vector
build, one pair join and one scoring stage per block — the §4.2
aggregate sharing carried through the whole physical pipeline, so a
10-(g, m) query costs ~2 blocks of stages, not 10.
"""
from __future__ import annotations

from functools import reduce
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from .aggregates import (
    G_COL,
    MergeGroup,
    VectorBlock,
    build_vector_blocks,
)
from .pairs import pair_condition, pair_key_cols, rename_side
from .spec import CompareSpec, Scorer, output_cols, side_prefix

KEYS1, KEYS2 = "__k1", "__k2"


def block_trend_vectors(
    rel: DataFrame, vary_cols: tuple[str, ...], value_cols: list[str], keys_name: str, prefix: str
) -> DataFrame:
    """Collapse a block relation to one row per trend with one sorted
    key array plus one value array per measure (horizontal partitioning
    of §4.2 — a partition per trend)."""
    vec = rel.groupBy(*vary_cols).agg(
        F.sort_array(F.collect_list(F.struct(F.col(G_COL), *value_cols))).alias("__vec")
    )
    sel = [*vary_cols, F.expr(f"transform(__vec, x -> x.{G_COL})").alias(keys_name)]
    for vc in value_cols:
        sel.append(F.expr(f"transform(__vec, x -> x.{vc})").alias(prefix + vc))
    return vec.select(*sel)


def _make_block_scorer(scorer: Scorer, block_gms, value_names, out_fields: list[str]):
    """Pandas kernel scoring every (g, m) of a block for each pair row.

    The key alignment (the DIFF join on grouping values, Def. 7) is
    computed once per pair and reused for every measure of the block.
    """
    gm_labels = [(g, m.name) for g, m in block_gms]

    def fn(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if pdf.empty:
                continue
            n = len(pdf)
            k1s, k2s = pdf[KEYS1].to_numpy(), pdf[KEYS2].to_numpy()
            v1s = [pdf["__l" + vc].to_numpy() for vc in value_names]
            v2s = [pdf["__r" + vc].to_numpy() for vc in value_names]
            scores = np.full((n, len(value_names)), np.nan)
            for i in range(n):
                k1 = np.asarray(k1s[i])
                k2 = np.asarray(k2s[i])
                _, i1, i2 = np.intersect1d(k1, k2, assume_unique=True, return_indices=True)
                if i1.size == 0:
                    continue
                for j in range(len(value_names)):
                    a = np.asarray(v1s[j][i], dtype=np.float64)[i1]
                    b = np.asarray(v2s[j][i], dtype=np.float64)[i2]
                    d = np.abs(a - b)
                    d = d * d if scorer.p == 2 else d**scorer.p
                    agg = {"SUM": np.sum, "AVG": np.mean, "MIN": np.min, "MAX": np.max}[scorer.agg]
                    scores[i, j] = float(agg(d))
            key_cols = [c for c in out_fields if c not in ("grouping", "measure", "score")]
            outs = []
            for j, (g, mname) in enumerate(gm_labels):
                out = pdf[key_cols].copy()
                out["grouping"] = g
                out["measure"] = mname
                out["score"] = scores[:, j]
                outs.append(out[~np.isnan(scores[:, j])])
            yield pd.concat(outs, ignore_index=True)[out_fields]

    return fn


def _score_block(block: VectorBlock, spec: CompareSpec, pair_filter: DataFrame | None) -> DataFrame:
    value_names = list(block.value_cols.values())
    v1 = block_trend_vectors(block.rel1, spec.t1.vary_cols, value_names, KEYS1, "__l")
    v2 = block_trend_vectors(block.rel2, spec.t2.vary_cols, value_names, KEYS2, "__r")
    a = rename_side(v1, spec.t1, 1, {})
    b = rename_side(v2, spec.t2, 2, {})
    pc = pair_condition(spec)
    pairs = a.join(b, pc, "inner") if pc is not None else a.crossJoin(b)
    if pair_filter is not None:
        pairs = pairs.join(F.broadcast(pair_filter), on=pair_key_cols(spec), how="left_semi")
    keep = [f for f in pairs.schema.fields if f.name.startswith(("l_", "r_"))]
    out_schema = T.StructType(
        keep
        + [
            T.StructField("grouping", T.StringType()),
            T.StructField("measure", T.StringType()),
            T.StructField("score", T.DoubleType()),
        ]
    )
    out_fields = [f.name for f in out_schema.fields]
    gms_in_order = list(block.value_cols)
    return pairs.mapInPandas(
        _make_block_scorer(spec.scorer, gms_in_order, value_names, out_fields), out_schema
    )


def compare_trendwise(
    df: DataFrame,
    spec: CompareSpec,
    groups: list[MergeGroup] | None = None,
    *,
    share_sides: bool = True,
    pair_filter: DataFrame | None = None,
) -> DataFrame:
    """Merged aggregates + trendwise partitioned comparison.

    ``pair_filter`` (a small relation of surviving pair-key tuples)
    restricts which trend pairs are scored — used by chained COMPARE
    operations (§6 R4) so later, less selective stages only score pairs
    that survived earlier stages.
    """
    blocks = build_vector_blocks(df, spec, groups, share_sides=share_sides)
    parts = [_score_block(b, spec, pair_filter) for b in blocks]
    out = reduce(DataFrame.unionByName, parts)
    for side, ts in ((1, spec.t1), (2, spec.t2)):
        for t in ts.fixed:
            out = out.withColumn(side_prefix(side) + t.col, F.lit(t.value))
    return out.select(*output_cols(spec))
