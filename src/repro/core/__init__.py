"""The paper's primary contribution: the COMPARE operator and its
execution strategies (basic, merged, trendwise, Φp pruning)."""
from .compare import compare, compare_topk, topk_exact
from .pruning import PruneStats, compare_topk_pruned, sturges
from .spec import (
    CompareSpec,
    ConstraintTerm,
    Measure,
    Scorer,
    TrendsetSpec,
    output_cols,
    parse_compare,
)

__all__ = [
    "compare",
    "compare_topk",
    "topk_exact",
    "compare_topk_pruned",
    "PruneStats",
    "sturges",
    "CompareSpec",
    "ConstraintTerm",
    "Measure",
    "Scorer",
    "TrendsetSpec",
    "output_cols",
    "parse_compare",
]
