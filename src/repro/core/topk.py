"""Top-k comparative queries joined back to base tuples (paper §3.2).

After COMPARE + ORDER BY/LIMIT picks the top-k pairs of trends, the
analyst wants the *tuples* of those trends (to plot them). This module
reproduces the §3.2 join between the top-k result and the base
relation.
"""
from __future__ import annotations

from functools import reduce

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .spec import CompareSpec, side_prefix


def topk_tuples(df: DataFrame, topk: DataFrame, spec: CompareSpec) -> DataFrame:
    """Base tuples of every trend appearing in a top-k result.

    Output: the base relation's columns plus ``pair_id`` (rank of the
    pair in ``topk``), ``side`` (1 or 2) and ``score`` — the §3.2
    ``sales T JOIN (… LIMIT k) S WHERE T.city = S.C1 OR …`` query.
    """
    rows = topk.collect()
    parts = []
    for i, row in enumerate(rows):
        for side, ts in ((1, spec.t1), (2, spec.t2)):
            cond = F.lit(True)
            for t in ts.terms:
                cond = cond & (F.col(t.col) == F.lit(row[side_prefix(side) + t.col]))
            parts.append(
                df.filter(cond)
                .withColumn("pair_id", F.lit(i))
                .withColumn("side", F.lit(side))
                .withColumn("score", F.lit(float(row["score"])))
            )
    if not parts:
        return (
            df.withColumn("pair_id", F.lit(0))
            .withColumn("side", F.lit(0))
            .withColumn("score", F.lit(0.0))
            .limit(0)
        )
    return reduce(DataFrame.unionByName, parts)
