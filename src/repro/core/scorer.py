"""DIFF(p) and aggregated distance functions (paper §2.2.3, Defs. 6–8).

Provides both Spark Column expressions (used by the join-based plans)
and numpy kernels (used by the trendwise/pruning operators and the
driver-side Algorithm 2).
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import Column
from pyspark.sql import functions as F

from .spec import Scorer


def diff_col(m1: Column, m2: Column, p: int) -> Column:
    """DIFF(m1, m2, p) = |m1 - m2|^p as a Spark column (Def. 7)."""
    d = F.abs(m1 - m2)
    return d * d if p == 2 else F.pow(d, float(p))


def agg_col(scorer: Scorer, diff: Column) -> Column:
    """The scorer's aggregate over a DIFF column."""
    fn = {"SUM": F.sum, "AVG": F.avg, "MIN": F.min, "MAX": F.max}[scorer.agg]
    return fn(diff)


def diff_np(v1: np.ndarray, v2: np.ndarray, p: int) -> np.ndarray:
    d = np.abs(v1 - v2)
    return d * d if p == 2 else d**p


def score_np(scorer: Scorer, v1: np.ndarray, v2: np.ndarray) -> float:
    """Score two *aligned* measure vectors. NaN when nothing matches."""
    if v1.size == 0:
        return float("nan")
    d = diff_np(v1, v2, scorer.p)
    fn = {"SUM": np.sum, "AVG": np.mean, "MIN": np.min, "MAX": np.max}[scorer.agg]
    return float(fn(d))


def align(k1: np.ndarray, v1: np.ndarray, k2: np.ndarray, v2: np.ndarray):
    """Inner-join two (sorted, unique) key/value vectors on key.

    Tuples with non-matching grouping values are ignored (Def. 7).
    Returns the aligned value vectors.
    """
    _, i1, i2 = np.intersect1d(k1, k2, assume_unique=True, return_indices=True)
    return v1[i1], v2[i2]


def score_pair(scorer: Scorer, k1, v1, k2, v2) -> float:
    """Align two trends on grouping value and score them."""
    a1, a2 = align(np.asarray(k1), np.asarray(v1, dtype=np.float64),
                   np.asarray(k2), np.asarray(v2, dtype=np.float64))
    return score_np(scorer, a1, a2)


def score_from_sum(scorer: Scorer, total: float, count: int) -> float:
    """Convert a SUM-of-DIFF and matched count to the scorer's scale.

    Used by the pruning operator, whose bounds are derived on SUM.
    """
    if scorer.agg == "SUM":
        return total
    if scorer.agg == "AVG":
        return total / count if count else float("nan")
    raise ValueError(f"pruning bounds only support SUM/AVG, got {scorer.agg}")
