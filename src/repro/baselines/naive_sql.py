"""The "unmodified DBMS" baseline: verbose SQL through Catalyst.

This is what SQL Server executes in the paper when the comparative
query is written with existing SQL clauses (Fig. 3): one subquery per
(grouping, measure), each with its own aggregations and a
trendset-level self-join — no sharing, no trendwise partitioning, no
pruning. Here the same SQL text (Spark dialect) is handed to
``spark.sql`` so Catalyst plays the stock optimizer's role.
"""
from __future__ import annotations

import uuid

from pyspark.sql import DataFrame

from repro.core.spec import CompareSpec
from repro.core.sql_gen import topk_sql, verbose_sql


def compare_naive_sql(df: DataFrame, spec: CompareSpec) -> DataFrame:
    """All pair scores via the verbose Fig. 3 SQL."""
    name = "R_" + uuid.uuid4().hex[:8]
    df.createOrReplaceTempView(name)
    return df.sparkSession.sql(verbose_sql(spec, name, dialect="spark"))


def compare_topk_naive_sql(
    df: DataFrame, spec: CompareSpec, k: int, ascending: bool = True
) -> DataFrame:
    """Top-k via the verbose SQL + ORDER BY/LIMIT (§3.2)."""
    name = "R_" + uuid.uuid4().hex[:8]
    df.createOrReplaceTempView(name)
    return df.sparkSession.sql(topk_sql(spec, k, ascending, name, dialect="spark"))
