"""Public COMPARE API: strategy dispatch.

Strategies (the Fig. 9b ablation levels, left to right):

* ``basic``     — §4.1 plan: per-(g, m) group-bys, trendset-level join.
* ``merged``    — §4.2 merged/shared group-by aggregates, same join.
* ``trendwise`` — merged aggregates + trendwise partitioned comparison.
* ``optimized`` — Algorithm-1-chosen merge groups + trendwise comparison.

Top-k-only strategies (``compare_topk``):

* ``pruned``  — Φp segment-aggregate pruning, no early termination.
* ``compare`` — the full system: Φp pruning + early termination,
  Algorithm-1 merge groups (the paper's COMPARE configuration).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .basic import compare_basic, compare_merged
from .pruning import compare_topk_pruned
from .spec import CompareSpec, output_cols
from .trendwise import compare_trendwise

EXACT_STRATEGIES = ("basic", "merged", "trendwise", "optimized")
TOPK_STRATEGIES = EXACT_STRATEGIES + ("pruned", "compare")


def _optimizer_groups(df: DataFrame, spec: CompareSpec, fds: dict[str, str] | None):
    from repro.plan.cost import TableStats
    from repro.plan.optimizer import merge_partition

    stats = TableStats.from_df(df, list(spec.input_cols), fds)
    return merge_partition(spec, stats)


def compare(
    df: DataFrame,
    spec: CompareSpec,
    strategy: str = "trendwise",
    *,
    fds: dict[str, str] | None = None,
) -> DataFrame:
    """Φ(R, T1 <-> T2, F): scores for every compared pair of trends.

    ``fds`` are optional functional-dependency hints consumed by the
    Algorithm-1 cost model under ``strategy='optimized'``.
    """
    if strategy == "basic":
        return compare_basic(df, spec)
    if strategy == "merged":
        return compare_merged(df, spec)
    if strategy == "trendwise":
        return compare_trendwise(df, spec)
    if strategy == "optimized":
        return compare_trendwise(df, spec, groups=_optimizer_groups(df, spec, fds))
    raise ValueError(f"unknown strategy {strategy!r}; pick one of {EXACT_STRATEGIES}")


def topk_exact(scores: DataFrame, k: int, ascending: bool = True) -> DataFrame:
    """Deterministic top-k over a COMPARE output (ties broken by identity)."""
    order = [F.col("score").asc() if ascending else F.col("score").desc()] + [
        F.col(c) for c in scores.columns if c != "score"
    ]
    return scores.orderBy(*order).limit(k)


def compare_topk(
    df: DataFrame,
    spec: CompareSpec,
    k: int = 5,
    *,
    ascending: bool = True,
    strategy: str = "compare",
    fds: dict[str, str] | None = None,
    **phi_kwargs,
) -> DataFrame:
    """Top-k comparative query (§3.2), via exact sort or the Φp operator."""
    if strategy in EXACT_STRATEGIES:
        return topk_exact(compare(df, spec, strategy, fds=fds), k, ascending)
    if strategy == "pruned":
        return compare_topk_pruned(
            df, spec, k, ascending=ascending, early_termination=False, **phi_kwargs
        )
    if strategy == "compare":
        groups = phi_kwargs.pop("groups", None)
        if groups is None and len(spec.gms) > 1:
            groups = _optimizer_groups(df, spec, fds)
        return compare_topk_pruned(
            df, spec, k, ascending=ascending, early_termination=True,
            groups=groups, **phi_kwargs,
        )
    raise ValueError(f"unknown strategy {strategy!r}; pick one of {TOPK_STRATEGIES}")
