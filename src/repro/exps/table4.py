"""Table 4: HUGE's throughput on the web-scale graph CW (q1-q3).

Paper (16-node AWS cluster, ClueWeb12, 42.6B edges):

|            | q1              | q2                | q3            |
|------------|-----------------|-------------------|---------------|
| Throughput | 2,895,179,286/s | 354,507,087,789/s | 206,696,071/s |

and BiGJoin's reported same-scale throughput of 26,681,430/s (q1) and
46,517,875/s (q3) — i.e. HUGE ~108x on q1, ~4.4x on q3.

We run q1-q3 on the CW twin with HUGE and BiGJoin and report
matches/second (results / modelled total time T). Absolute numbers are
mini-scale; the shape targets are (a) q2 >> q1 >> q3 in throughput
(result-density ordering) and (b) HUGE > BiGJoin on every query.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.baselines.runner import run_system
from repro.exps.common import build_graph
from repro.graphs.queries import QUERIES

PAPER_THROUGHPUT = {
    "q1": 2_895_179_286,
    "q2": 354_507_087_789,
    "q3": 206_696_071,
}
PAPER_BIGJOIN = {"q1": 26_681_430, "q3": 46_517_875}


CW_SCALE = 0.3  # baseline fraction of the CW twin: q1 on the full twin
# materialises >30M squares, which local Spark grinds through for many
# minutes; ``scale`` multiplies this baseline.


def run_table4(
    spark: SparkSession, *, scale: float = 1.0, k: int = 16
) -> list[dict]:
    g = build_graph(spark, "CW", scale=scale * CW_SCALE, k=k)
    rows = []
    try:
        for qname in ("q1", "q2", "q3"):
            q = QUERIES[qname]
            for system in ("HUGE", "BIGJOIN"):
                run = run_system(system, q, g, repeats=2)
                t = max(run.stats.t_total_s, 1e-9)
                rows.append(
                    {
                        "query": qname,
                        "work": system,
                        "results": run.stats.result_count,
                        "T_s": round(run.stats.t_total_s, 3),
                        "C_MB": round(run.stats.comm_bytes / 1e6, 3),
                        "throughput_per_s": int(run.stats.result_count / t),
                        "paper_throughput_per_s": (
                            PAPER_THROUGHPUT.get(qname)
                            if system == "HUGE"
                            else PAPER_BIGJOIN.get(qname)
                        ),
                    }
                )
    finally:
        g.unpersist()
    return rows
