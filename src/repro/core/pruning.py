"""The Φp pruning physical operator for DIFF-based comparison (paper §5).

Summarize → Bound → Prune:

1. **Summarize** — each trend is summarized by *segment aggregates*
   (COUNT, SUM, MIN, MAX per segment) plus the set of grouping keys per
   segment (the paper's bitmap, used to COUNT matching tuples between
   trends). Segment count follows Sturges, ``floor(1 + log2(n))``.
   Segments are aligned on **global grouping-value quantile buckets**
   (identical to the paper's index segments when trend domains
   coincide, and sound when they do not — see DESIGN.md §4). Summaries
   are computed *in Spark* (a groupBy over trend × segment) and
   collected: O(p · log(n/p)) floats.
2. **Bound** — per pair: lower bound per fully-matched segment is
   ``cnt · DIFF(avg1, avg2, p)`` (Theorem 1, convexity); upper bound is
   ``cnt · max(|max1−min2|, |max2−min1|)^p`` (non-negativity +
   monotonicity). Sums over segments bound ``SUM OVER DIFF(p)``; AVG
   scores divide by the exact matched count (known from the bitmaps).
3. **Prune** — the threshold T is the k-th best pessimistic bound over
   all pairs; any pair whose optimistic bound cannot reach T is pruned
   *before its tuples are ever joined*. Surviving trends' aggregated
   vectors are then fetched and refined one segment (or a configurable
   tuple chunk, Fig. 12) at a time under two priority queues
   (Algorithm 2) until the top-k pairs are exact.

This module is the paper's new physical operator; Algorithm 2 runs
single-threaded on the driver (as in the paper's pseudo-code) over
Spark-computed summaries — see DESIGN.md §2 for the layering argument.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from .aggregates import (
    G_COL,
    V_COL,
    MergeGroup,
    build_side_aggregates,  # noqa: F401  (used by tests driving phase internals)
    build_vector_blocks,
    same_grouping_groups,
)
from .scorer import score_from_sum
from .spec import CompareSpec, GM, output_cols, side_prefix


def sturges(n: int) -> int:
    """Number of segment aggregates per trend, ``floor(1 + log2(n))``."""
    return max(1, int(1 + math.log2(n))) if n > 0 else 1


def _prune_slack(thr: float) -> float:
    """Relative epsilon for prune comparisons.

    For p=1 the Theorem-1 lower bound is *exactly* tight when all tuple
    diffs share a sign, so float rounding can place a pair's bound a few
    ulps above its true score; without slack the threshold would prune
    the k-th pair against itself.
    """
    return 1e-9 * max(1.0, abs(thr))


@dataclass
class PruneStats:
    """Observability for the ablation / sensitivity experiments."""

    n_pairs: int = 0
    pruned_initial: int = 0
    pruned_refining: int = 0
    refine_steps: int = 0
    segments_refined: int = 0
    tuples_compared: int = 0
    summary_floats: int = 0  # 4 aggregates × segments × trends (memory proxy)
    surviving_trends: int = 0
    total_trends: int = 0


@dataclass
class _TrendSummary:
    """SegAgg of one trend: per-bucket aggregates + key sets (bitmap)."""

    cnt: np.ndarray
    sum: np.ndarray
    min: np.ndarray
    max: np.ndarray
    keys: list[np.ndarray]  # global key indices per bucket, sorted


@dataclass
class _PairState:
    """TState of a candidate pair (bounds + refinement cursor)."""

    gm_idx: int
    t1: tuple
    t2: tuple
    buckets: list[int]
    inter: list[np.ndarray]
    cnt: int
    lb_b: np.ndarray
    ub_b: np.ndarray
    next_b: int = 0
    pruned: bool = False
    heap_key: float = field(default=0.0)

    @property
    def lb_sum(self) -> float:
        return float(self.lb_b.sum())

    @property
    def ub_sum(self) -> float:
        return float(self.ub_b.sum())

    @property
    def exact(self) -> bool:
        return self.next_b >= len(self.buckets)


def _py(v):
    """numpy scalar → python scalar (for createDataFrame rows)."""
    return v.item() if isinstance(v, np.generic) else v


def _collect_summaries(
    rel: DataFrame, vary_cols: tuple[str, ...], bucket_df: DataFrame, n_buckets: int
) -> dict[tuple, _TrendSummary]:
    """Compute per-(trend, segment) aggregates in Spark and collect them."""
    joined = rel.join(F.broadcast(bucket_df), on=G_COL, how="inner")
    agg = joined.groupBy(*vary_cols, "__b").agg(
        F.count(V_COL).alias("__cnt"),
        F.sum(V_COL).alias("__sum"),
        F.min(V_COL).alias("__min"),
        F.max(V_COL).alias("__max"),
        F.sort_array(F.collect_list("__gi")).alias("__keys"),
    )
    out: dict[tuple, _TrendSummary] = {}
    for row in agg.collect():
        tid = tuple(row[c] for c in vary_cols)
        s = out.get(tid)
        if s is None:
            s = out[tid] = _TrendSummary(
                cnt=np.zeros(n_buckets, dtype=np.int64),
                sum=np.zeros(n_buckets, dtype=np.float64),
                min=np.full(n_buckets, np.inf),
                max=np.full(n_buckets, -np.inf),
                keys=[np.empty(0, dtype=np.int64)] * n_buckets,
            )
        b = row["__b"]
        s.cnt[b] = row["__cnt"]
        s.sum[b] = row["__sum"]
        s.min[b] = row["__min"]
        s.max[b] = row["__max"]
        s.keys[b] = np.asarray(row["__keys"], dtype=np.int64)
    return out


def _collect_vectors(
    rel: DataFrame,
    vary_cols: tuple[str, ...],
    survivors: set[tuple],
    gidx: dict,
    spark: SparkSession,
) -> dict[tuple, tuple[np.ndarray, np.ndarray]]:
    """Fetch (sorted key-index, value) vectors for surviving trends only."""
    if not survivors:
        return {}
    if vary_cols:
        sdf = spark.createDataFrame(
            pd.DataFrame([{c: _py(v) for c, v in zip(vary_cols, t)} for t in survivors])
        )
        rel = rel.join(F.broadcast(sdf), on=list(vary_cols), how="left_semi")
    out: dict[tuple, list] = {}
    for row in rel.collect():
        tid = tuple(row[c] for c in vary_cols)
        out.setdefault(tid, []).append((gidx[row[G_COL]], row[V_COL]))
    vecs = {}
    for tid, kv in out.items():
        kv.sort()
        k = np.fromiter((x[0] for x in kv), dtype=np.int64, count=len(kv))
        v = np.fromiter((x[1] for x in kv), dtype=np.float64, count=len(kv))
        vecs[tid] = (k, v)
    return vecs


def _constraint_tuple(spec: CompareSpec, side: int, tid: tuple) -> tuple:
    """Full constraint tuple (sorted col order) for identity comparison."""
    ts = spec.t1 if side == 1 else spec.t2
    vary = list(ts.vary_cols)
    vals = {}
    for t in ts.terms:
        vals[t.col] = t.value if not t.varies else tid[vary.index(t.col)]
    return tuple(vals[c] for c in sorted(ts.cols))


def _candidate_pairs(spec: CompareSpec, t1_ids, t2_ids):
    for a in t1_ids:
        ca = _constraint_tuple(spec, 1, a)
        for b in t2_ids:
            cb = _constraint_tuple(spec, 2, b)
            if spec.dedup_symmetric:
                if not ca < cb:
                    continue
            elif spec.exclude_equal and ca == cb:
                continue
            yield a, b


def _bounds(s1: _TrendSummary, s2: _TrendSummary, p: int):
    """Per-bucket bounds on SUM OVER DIFF(p) between two trends."""
    buckets, inter, lbs, ubs = [], [], [], []
    n = len(s1.cnt)
    for b in range(n):
        k1, k2 = s1.keys[b], s2.keys[b]
        if len(k1) == 0 or len(k2) == 0:
            continue
        if len(k1) == len(k2) and np.array_equal(k1, k2):
            ik = k1  # dense, fully-aligned segment (the common case)
        else:
            ik = np.intersect1d(k1, k2, assume_unique=True)
        c = len(ik)
        if c == 0:
            continue
        gap = max(abs(s1.max[b] - s2.min[b]), abs(s2.max[b] - s1.min[b]))
        ub = c * gap**p
        if c == s1.cnt[b] == s2.cnt[b]:
            # fully matched segment: Theorem 1 applies to the segment AVGs
            lb = c * abs(s1.sum[b] / s1.cnt[b] - s2.sum[b] / s2.cnt[b]) ** p
        else:
            lb = 0.0  # partially matched: 0 is the sound lower bound
        buckets.append(b)
        inter.append(ik)
        lbs.append(lb)
        ubs.append(ub)
    return buckets, inter, np.asarray(lbs), np.asarray(ubs)


def _refine_bucket(pair: _PairState, vec1, vec2, p: int) -> int:
    """Replace one bucket's bounds with the exact partial score."""
    i = pair.next_b
    ik = pair.inter[i]
    k1, v1 = vec1
    k2, v2 = vec2
    d = np.abs(v1[np.searchsorted(k1, ik)] - v2[np.searchsorted(k2, ik)])
    exact = float(np.sum(d * d if p == 2 else d**p))
    pair.lb_b[i] = exact
    pair.ub_b[i] = exact
    pair.next_b += 1
    return len(ik)


class _Phi(object):
    """Driver-side state of one Φp invocation across all (g, m)."""

    def __init__(self, spec: CompareSpec, k: int, ascending: bool):
        self.spec, self.k, self.asc = spec, k, ascending
        self.pairs: list[_PairState] = []
        self.stats = PruneStats()

    # score-scale bounds (SUM bounds converted through the scorer)
    def _lo(self, pr: _PairState) -> float:
        return score_from_sum(self.spec.scorer, pr.lb_sum, pr.cnt)

    def _hi(self, pr: _PairState) -> float:
        return score_from_sum(self.spec.scorer, pr.ub_sum, pr.cnt)

    # optimistic / pessimistic bounds under the requested direction
    def opt(self, pr: _PairState) -> float:
        return self._hi(pr) if not self.asc else -self._lo(pr)

    def pess(self, pr: _PairState) -> float:
        return self._lo(pr) if not self.asc else -self._hi(pr)

    def threshold(self) -> float:
        """k-th largest pessimistic bound over unpruned pairs (PQ_S top)."""
        vals = np.asarray([self.pess(p) for p in self.pairs if not p.pruned])
        if len(vals) <= self.k:
            return -np.inf
        return float(np.partition(vals, -self.k)[-self.k])


def compare_topk_pruned(
    df: DataFrame,
    spec: CompareSpec,
    k: int = 5,
    *,
    ascending: bool = True,
    n_segments: int | None = None,
    tuples_per_update: int | None = None,
    early_termination: bool = True,
    groups: list[MergeGroup] | None = None,
    share_sides: bool = True,
    return_stats: bool = False,
):
    """Top-k comparative query through the Φp pruning operator.

    Returns a DataFrame with the canonical COMPARE output schema
    restricted to the top-k pairs (ordered best-first); with
    ``return_stats=True`` also returns a :class:`PruneStats`.
    """
    if spec.scorer.agg not in ("SUM", "AVG"):
        raise ValueError(
            f"Φp bounds require a SUM/AVG scorer; use the trendwise strategy "
            f"for {spec.scorer.agg}"
        )
    spark = df.sparkSession
    groups = groups if groups is not None else same_grouping_groups(spec.gms)
    # Block-organized aggregates (§4.2 sharing): one relation per grouping
    # column carrying every measure, persisted for the three phases below.
    blocks = build_vector_blocks(df, spec, groups, share_sides=share_sides)
    gm_block: dict = {}
    for bi, blk in enumerate(blocks):
        for gm, vc in blk.value_cols.items():
            gm_block[gm] = (bi, vc)

    # ---- grouping domains: one Spark action per distinct grouping column --
    domains: dict[str, list] = {}
    for blk in blocks:
        if blk.g in domains:
            continue
        dom = blk.rel2.select(G_COL)
        if not blk.shared:
            dom = dom.union(blk.rel1.select(G_COL))
        domains[blk.g] = sorted(r[0] for r in dom.distinct().collect())

    buckets_by_g: dict[str, tuple] = {}
    for g, gvals in domains.items():
        nd = len(gvals)
        l = n_segments if n_segments is not None else sturges(nd)
        l = max(1, min(l, nd)) if nd else 1
        gidx = {v: i for i, v in enumerate(gvals)}
        bucket_df = spark.createDataFrame(
            pd.DataFrame(
                {G_COL: [_py(v) for v in gvals],
                 "__gi": np.arange(nd, dtype=np.int64),
                 "__b": (np.arange(nd, dtype=np.int64) * l) // max(nd, 1)}
            )
        ) if nd else None
        buckets_by_g[g] = (gidx, bucket_df, l)

    phi = _Phi(spec, k, ascending)

    # ---- summaries (Summarize): segment aggregates for every measure of a
    # block in ONE groupBy; fetched through Arrow, not row collect ----------
    def _block_summaries(rel, vary, blk):
        bucket_df = buckets_by_g[blk.g][1]
        l = buckets_by_g[blk.g][2]
        vcs = list(blk.value_cols.values())
        if bucket_df is None:
            return {gm: {} for gm in blk.value_cols}
        aggs = [F.count(F.lit(1)).alias("__cnt"),
                F.sort_array(F.collect_list("__gi")).alias("__keys")]
        for vc in vcs:
            aggs += [F.sum(vc).alias("s" + vc), F.min(vc).alias("n" + vc),
                     F.max(vc).alias("x" + vc)]
        pdf = (
            rel.join(F.broadcast(bucket_df), on=G_COL, how="inner")
            .groupBy(*vary, "__b")
            .agg(*aggs)
            .toPandas()
        )
        out = {gm: {} for gm in blk.value_cols}
        col = {name: pdf[name].to_numpy() for name in pdf.columns}
        for i in range(len(pdf)):
            tid = tuple(col[c][i] for c in vary)
            b = col["__b"][i]
            keys = np.asarray(col["__keys"][i], dtype=np.int64)
            for gm, vc in blk.value_cols.items():
                s = out[gm].get(tid)
                if s is None:
                    s = out[gm][tid] = _TrendSummary(
                        cnt=np.zeros(l, dtype=np.int64),
                        sum=np.zeros(l, dtype=np.float64),
                        min=np.full(l, np.inf),
                        max=np.full(l, -np.inf),
                        keys=[np.empty(0, dtype=np.int64)] * l,
                    )
                s.cnt[b] = col["__cnt"][i]
                s.sum[b] = col["s" + vc][i]
                s.min[b] = col["n" + vc][i]
                s.max[b] = col["x" + vc][i]
                s.keys[b] = keys
        return out

    s1_by_gm: dict = {}
    s2_by_gm: dict = {}
    for blk in blocks:
        s2 = _block_summaries(blk.rel2, spec.t2.vary_cols, blk)
        s1 = s2 if blk.shared else _block_summaries(blk.rel1, spec.t1.vary_cols, blk)
        for gm in blk.value_cols:
            s2_by_gm[gm] = s2[gm]
            s1_by_gm[gm] = s1[gm]

    # ---- Bound: per-pair segment bounds; candidate pairs per (g, m) -------
    for gi, gm in enumerate(spec.gms):
        s1, s2 = s1_by_gm[gm], s2_by_gm[gm]
        shared = blocks[gm_block[gm][0]].shared
        l = buckets_by_g[gm[0]][2]
        phi.stats.total_trends += len(s2) + (0 if shared else len(s1))
        phi.stats.summary_floats += 4 * l * (len(s2) + (0 if shared else len(s1)))
        for a, b in _candidate_pairs(spec, list(s1), list(s2)):
            buckets, inter, lbs, ubs = _bounds(s1[a], s2[b], spec.scorer.p)
            cnt = int(sum(len(x) for x in inter))
            if cnt == 0:
                continue  # no matching grouping values: no score (Def. 7)
            phi.pairs.append(
                _PairState(gi, a, b, buckets, inter, cnt, lbs.copy(), ubs.copy())
            )

    phi.stats.n_pairs = len(phi.pairs)

    # ---- Prune: against the k-th best pessimistic bound -------------------
    thr = phi.threshold()
    for pr in phi.pairs:
        if phi.opt(pr) < thr - _prune_slack(thr):
            pr.pruned = True
    phi.stats.pruned_initial = sum(p.pruned for p in phi.pairs)

    # ---- fetch vectors for surviving trends only, one action per block ----
    surv1: list[set] = [set() for _ in spec.gms]
    surv2: list[set] = [set() for _ in spec.gms]
    for pr in phi.pairs:
        if not pr.pruned:
            surv1[pr.gm_idx].add(pr.t1)
            surv2[pr.gm_idx].add(pr.t2)

    def _block_vectors(rel, vary, blk, survivors):
        gidx = buckets_by_g[blk.g][0]
        vcs = list(blk.value_cols.values())
        out = {gm: {} for gm in blk.value_cols}
        if not survivors:
            return out
        if vary:
            sdf = spark.createDataFrame(
                pd.DataFrame([{c: _py(v) for c, v in zip(vary, t)} for t in survivors])
            )
            rel = rel.join(F.broadcast(sdf), on=list(vary), how="left_semi")
        pdf = rel.toPandas()
        pdf["__gi"] = pdf[G_COL].map(gidx)
        for tid, grp in (
            pdf.groupby(list(vary), sort=False) if vary else [((), pdf)]
        ):
            tid = tid if isinstance(tid, tuple) else (tid,)
            grp = grp.sort_values("__gi")
            ks = grp["__gi"].to_numpy(dtype=np.int64)
            for gm, vc in blk.value_cols.items():
                out[gm][tid] = (ks, grp[vc].to_numpy(dtype=np.float64))
        return out

    vecs1: list[dict] = [None] * len(spec.gms)
    vecs2: list[dict] = [None] * len(spec.gms)
    gm_index = {gm: gi for gi, gm in enumerate(spec.gms)}
    for blk in blocks:
        blk_surv2 = set()
        blk_surv1 = set()
        for gm in blk.value_cols:
            gi = gm_index[gm]
            blk_surv2 |= surv2[gi]
            blk_surv1 |= surv1[gi]
        if blk.shared:
            v2 = _block_vectors(blk.rel2, spec.t2.vary_cols, blk, blk_surv2 | blk_surv1)
            v1 = v2
        else:
            v2 = _block_vectors(blk.rel2, spec.t2.vary_cols, blk, blk_surv2)
            v1 = _block_vectors(blk.rel1, spec.t1.vary_cols, blk, blk_surv1)
        for gm in blk.value_cols:
            gi = gm_index[gm]
            vecs2[gi] = v2[gm]
            vecs1[gi] = v1[gm]
    phi.stats.surviving_trends = sum(len(s) for s in surv1) + sum(len(s) for s in surv2)

    p_exp = spec.scorer.p
    alive = [pr for pr in phi.pairs if not pr.pruned]

    def refine_chunk(pr: _PairState) -> None:
        """Refine one update's worth of segments (Fig. 12 knob)."""
        v1 = vecs1[pr.gm_idx][pr.t1]
        v2 = vecs2[pr.gm_idx][pr.t2]
        budget = tuples_per_update if tuples_per_update else max(
            1, pr.cnt // max(1, len(pr.buckets))
        )
        done = 0
        while not pr.exact and done < budget:
            done += _refine_bucket(pr, v1, v2, p_exp)
            phi.stats.segments_refined += 1
        phi.stats.tuples_compared += done
        phi.stats.refine_steps += 1

    results: list[_PairState] = []
    if not early_termination:
        # ablation stage: segment pruning only — score all survivors fully
        for pr in alive:
            while not pr.exact:
                refine_chunk(pr)
        results = sorted(alive, key=phi.opt, reverse=True)[:k]
    else:
        # Algorithm 2: PQ over optimistic bounds, incremental refinement
        import heapq

        heap: list = []
        seq = 0
        for pr in alive:
            pr.heap_key = phi.opt(pr)
            heapq.heappush(heap, (-pr.heap_key, seq, pr))
            seq += 1
        thr = phi.threshold()
        while heap and len(results) < k:
            negkey, _, pr = heapq.heappop(heap)
            if pr.pruned or -negkey != pr.heap_key:
                continue  # stale entry
            if pr.exact:
                results.append(pr)  # max optimistic bound and exact ⇒ next best
                continue
            old_pess = phi.pess(pr)
            refine_chunk(pr)
            if phi.pess(pr) > max(old_pess, thr):
                thr = phi.threshold()
            if phi.opt(pr) < thr - _prune_slack(thr):
                pr.pruned = True
                phi.stats.pruned_refining += 1
                continue
            pr.heap_key = phi.opt(pr)
            heapq.heappush(heap, (-pr.heap_key, seq, pr))
            seq += 1

    # ---- build the output relation ----------------------------------------
    rows = []
    for pr in results:
        g, m = spec.gms[pr.gm_idx]
        row = {}
        for c, v in zip(spec.t1.vary_cols, pr.t1):
            row[side_prefix(1) + c] = _py(v)
        for t in spec.t1.fixed:
            row[side_prefix(1) + t.col] = t.value
        for c, v in zip(spec.t2.vary_cols, pr.t2):
            row[side_prefix(2) + c] = _py(v)
        for t in spec.t2.fixed:
            row[side_prefix(2) + t.col] = t.value
        row["grouping"] = g
        row["measure"] = m.name
        row["score"] = score_from_sum(spec.scorer, pr.lb_sum, pr.cnt)
        rows.append(row)

    schema = _output_schema(df, spec)
    out = spark.createDataFrame([tuple(r[c] for c in output_cols(spec)) for r in rows], schema)
    return (out, phi.stats) if return_stats else out


def _output_schema(df: DataFrame, spec: CompareSpec) -> T.StructType:
    by_name = {f.name: f.dataType for f in df.schema.fields}
    fields = []
    for side, ts in ((1, spec.t1), (2, spec.t2)):
        for t in ts.terms:
            fields.append(T.StructField(side_prefix(side) + t.col, by_name[t.col]))
    fields += [
        T.StructField("grouping", T.StringType()),
        T.StructField("measure", T.StringType()),
        T.StructField("score", T.DoubleType()),
    ]
    return T.StructType(fields)
