"""Table 1: the square query (q1) on LJ across all five systems.

Paper (10-machine cluster, LJ, square):

| Comm.   | Work    | T(s)   | T_R(s) | T_C(s) | C(GB) | M(GB) |
|---------|---------|--------|--------|--------|-------|-------|
| Pushing | SEED    | 1536.6 | 343.2  | 1193.4 | 537.2 | 42.3  |
| Pushing | BiGJoin | 195.9  | 122.1  | 73.8   | 534.5 | 14.3  |
| Pulling | BENU    | 4091.7 | 3763.2 | 328.5  | 25.3  | 1.3   |
| Pulling | RADS    | 2643.8 | 2478.7 | 165.1  | 452.7 | 19.2  |
| Hybrid  | HUGE    | 52.3   | 51.5   | 0.8    | 4.6   | 2.2   |

We run the same five systems on the LJ twin over the simulated
10-machine cluster. Shape targets: pushing systems move orders of
magnitude more bytes than HUGE; BENU moves little but is computation-
dominated (k/v overhead); RADS communicates heavily (region re-pulls)
and is slowed by its star plan; HUGE wins T with the smallest C; BENU's
M is smallest, HUGE's close behind, BFS pushing systems far larger.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.baselines.runner import run_system
from repro.exps.common import build_graph
from repro.graphs.queries import QUERIES

PAPER_ROWS = [
    {"work": "SEED", "comm": "pushing", "T_s": 1536.6, "T_R_s": 343.2, "T_C_s": 1193.4, "C_GB": 537.2, "M_GB": 42.3},
    {"work": "BIGJOIN", "comm": "pushing", "T_s": 195.9, "T_R_s": 122.1, "T_C_s": 73.8, "C_GB": 534.5, "M_GB": 14.3},
    {"work": "BENU", "comm": "pulling", "T_s": 4091.7, "T_R_s": 3763.2, "T_C_s": 328.5, "C_GB": 25.3, "M_GB": 1.3},
    {"work": "RADS", "comm": "pulling", "T_s": 2643.8, "T_R_s": 2478.7, "T_C_s": 165.1, "C_GB": 452.7, "M_GB": 19.2},
    {"work": "HUGE", "comm": "hybrid", "T_s": 52.3, "T_R_s": 51.5, "T_C_s": 0.8, "C_GB": 4.6, "M_GB": 2.2},
]

SYSTEMS = ["SEED", "BIGJOIN", "BENU", "RADS", "HUGE"]


def run_table1(
    spark: SparkSession, *, scale: float = 1.0, k: int = 10, query: str = "q1"
) -> list[dict]:
    """Reproduce Table 1 on the LJ twin; returns one row per system."""
    g = build_graph(spark, "LJ", scale=scale, k=k)
    q = QUERIES[query]
    rows = []
    try:
        for system in SYSTEMS:
            run = run_system(system, q, g, repeats=2)
            rows.append(run.table_row())
    finally:
        g.unpersist()
    counts = {r["results"] for r in rows}
    assert len(counts) == 1, f"systems disagree on the result count: {rows}"
    return rows
