"""Logical-plan substrate: algebra nodes, §6 rules R1–R5, Algorithm 1
merge-partition optimizer, cost model, and lowering to DataFrames."""
from .cost import TableStats, compare_plan_cost
from .logical import (
    Compare,
    CompareChain,
    Filter,
    GroupAgg,
    Join,
    PairJoin,
    Rename,
    Scan,
    ScoreAgg,
    TopK,
    Union,
)
from .lower import lower
from .optimizer import DEFAULT_RULES, merge_partition, optimize_tree

__all__ = [
    "TableStats",
    "compare_plan_cost",
    "Compare",
    "CompareChain",
    "Filter",
    "GroupAgg",
    "Join",
    "PairJoin",
    "Rename",
    "Scan",
    "ScoreAgg",
    "TopK",
    "Union",
    "lower",
    "merge_partition",
    "optimize_tree",
    "DEFAULT_RULES",
]
