"""Table 4: the Q1–Q4 workload definitions with trend counts.

Prints one row per (query, dataset) with the constraint, the
(grouping, measure) count, and the number of trends per trendset — at
both the paper's cardinalities and this reproduction's scaled ones.
"""
import _common

from repro.bench.workloads import flight_queries, tpcds_queries

PAPER_TRENDS = {"flight": 384, "tpcds": 2040}
REPRO_TRENDS = {"flight": 128, "tpcds": 96}


def _trends(ts, n_entities):
    n = 1
    for _ in ts.vary_cols:
        n *= n_entities
    return n


def run(spark=None, sf=None):
    rows = []
    for dataset, queries in (("flight", flight_queries()), ("tpcds", tpcds_queries())):
        for name, wl in queries.items():
            s = wl.spec
            rows.append(
                {
                    "query": name,
                    "dataset": dataset,
                    "t1_constraint": " & ".join(
                        f"{t.col}={t.value}" if not t.varies else f"all {t.col}"
                        for t in s.t1.terms
                    ),
                    "t2_constraint": " & ".join(
                        f"{t.col}={t.value}" if not t.varies else f"all {t.col}"
                        for t in s.t2.terms
                    ),
                    "n_gm": len(s.gms),
                    "trends_per_side_paper": _trends(s.t2, PAPER_TRENDS[dataset]) * len(s.gms),
                    "trends_per_side_repro": _trends(s.t2, REPRO_TRENDS[dataset]) * len(s.gms),
                    "pairs_repro": s.n_pairs(
                        {s.t2.terms[0].col: REPRO_TRENDS[dataset]}
                    ),
                    "k": wl.k,
                }
            )
    return rows


if __name__ == "__main__":
    _common.main_wrapper("table4_workloads", run)
