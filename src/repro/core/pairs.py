"""Shared pair-join machinery for COMPARE execution strategies.

Every strategy renames the per-side aggregated relations into the
canonical ``l_``/``r_`` namespace and joins them under the same pair
condition (trend-identity inequality / symmetric dedup), so the basic,
merged, trendwise and pruned plans all emit identical output relations.
"""
from __future__ import annotations

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from .spec import CompareSpec, GM, TrendsetSpec, side_prefix


def rename_side(rel: DataFrame, ts: TrendsetSpec, side: int, extra: dict[str, str]) -> DataFrame:
    """Prefix a side's vary columns with ``l_``/``r_`` and rename extras."""
    pre = side_prefix(side)
    for c in ts.vary_cols:
        rel = rel.withColumnRenamed(c, pre + c)
    for old, new in extra.items():
        rel = rel.withColumnRenamed(old, new)
    return rel


def _constraint_fields(spec: CompareSpec, side: int) -> list[Column]:
    """The full constraint tuple of a side, ordered by column name.

    Varying columns come from the (renamed) relation; fixed terms are
    literals. Used for trend-identity comparison between sides. Scalar
    comparisons (not structs) are used downstream so Spark's numeric
    type coercion applies to literals.
    """
    ts = spec.t1 if side == 1 else spec.t2
    pre = side_prefix(side)
    fields = []
    for col in sorted(ts.cols):
        term = next(t for t in ts.terms if t.col == col)
        fields.append(F.col(pre + col) if term.varies else F.lit(term.value))
    return fields


def _lex_lt(a: list[Column], b: list[Column]) -> Column:
    """Lexicographic a < b over equal-length field lists."""
    cond = a[-1] < b[-1]
    for x, y in zip(reversed(a[:-1]), reversed(b[:-1])):
        cond = (x < y) | ((x == y) & cond)
    return cond


def pair_condition(spec: CompareSpec) -> Column | None:
    """Join condition between the two (renamed) sides, or None for cross."""
    a = _constraint_fields(spec, 1)
    b = _constraint_fields(spec, 2)
    if spec.dedup_symmetric:
        return _lex_lt(a, b)
    if spec.exclude_equal:
        eq = a[0] == b[0]
        for x, y in zip(a[1:], b[1:]):
            eq = eq & (x == y)
        return ~eq
    return None


def pair_key_cols(spec: CompareSpec) -> list[str]:
    """Vary columns identifying a pair of trends in the output."""
    return [side_prefix(1) + c for c in spec.t1.vary_cols] + [
        side_prefix(2) + c for c in spec.t2.vary_cols
    ]


def finish_output(scored: DataFrame, spec: CompareSpec, gm: GM) -> DataFrame:
    """Attach fixed-constraint literals and (grouping, measure) labels."""
    g, m = gm
    for side, ts in ((1, spec.t1), (2, spec.t2)):
        for t in ts.fixed:
            scored = scored.withColumn(side_prefix(side) + t.col, F.lit(t.value))
    return scored.withColumn("grouping", F.lit(g)).withColumn("measure", F.lit(m.name))
