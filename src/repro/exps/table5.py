"""Table 5: cache designs — LRBU vs its crippled variants on q1-q3.

Paper (UK graph):

|    | LRBU          | LRBU-Copy | LRBU-Lock | LRU-Inf | Cncr-LRU |
|----|---------------|-----------|-----------|---------|----------|
| q1 | 589.3 (27.7)  | 734.1     | 920.1     | 997.5   | 2597.1   |
| q2 | 63.3 (3.7)    | 74.5      | 98.0      | 107.7   | 240.5    |
| q3 | 200.6 (24.8)  | 314.5     | 525.4     | 563.4   | 980.9    |

(LRBU's bracketed number is the fetch-stage time t_f, ~7.5% of total.)

We run each query with HUGE on the UK twin, collect the *real* remote
adjacency-access traces (per simulated machine, in batch order), and
replay the identical streams through the five cache designs with their
per-operation cost models (``cache/replay.py``). Reported time = the
run's base compute time + the replayed cache/network time. Shape
targets: LRBU < LRBU-Copy < LRBU-Lock < LRU-Inf < Cncr-LRU on every
query, and t_f a small fraction of LRBU's total.
"""
from __future__ import annotations

from collections import defaultdict

import numpy as np
from pyspark.sql import SparkSession

from repro.baselines.runner import CACHE_FRACTION, graph_bytes, run_system
from repro.cache.replay import VARIANTS, replay_all
from repro.core.accounting import BYTES_PER_VID
from repro.exps.common import build_graph
from repro.graphs.queries import QUERIES

PAPER_ROWS = [
    {"query": "q1", "LRBU": 589.3, "LRBU_tf": 27.7, "LRBU-Copy": 734.1, "LRBU-Lock": 920.1, "LRU-Inf": 997.5, "Cncr-LRU": 2597.1},
    {"query": "q2", "LRBU": 63.3, "LRBU_tf": 3.7, "LRBU-Copy": 74.5, "LRBU-Lock": 98.0, "LRU-Inf": 107.7, "Cncr-LRU": 240.5},
    {"query": "q3", "LRBU": 200.6, "LRBU_tf": 24.8, "LRBU-Copy": 314.5, "LRBU-Lock": 525.4, "LRU-Inf": 563.4, "Cncr-LRU": 980.9},
]

BATCH_ACCESSES = 2048  # accesses per replay batch (mini-scale 512K twin)


def batched_traces(
    raw: list[tuple[int, int, int]], k: int, batch: int = BATCH_ACCESSES, seed: int = 0
) -> list[list[list[tuple[int, int]]]]:
    """Group (machine, vid, deg) access rows into per-machine batch lists.

    Rows are shuffled (deterministically) first: the collected order
    inherits Catalyst's join-output clustering, where all accesses to
    one vertex are adjacent — an artifact that would zero out cross-
    batch cache reuse. In the real engine partial results arrive
    interleaved across pivots."""
    rng = np.random.default_rng(seed)
    per_machine: dict[int, list[tuple[int, int]]] = defaultdict(list)
    for mach, vid, deg in raw:
        per_machine[mach].append((vid, deg))
    traces = []
    for m in range(k):
        seq = per_machine.get(m, [])
        if seq:
            order = rng.permutation(len(seq))
            seq = [seq[i] for i in order]
        traces.append([seq[i : i + batch] for i in range(0, len(seq), batch)])
    return traces


def run_table5(
    spark: SparkSession,
    *,
    scale: float = 1.0,
    k: int = 10,
    trace_limit: int = 300_000,
    queries: tuple[str, ...] = ("q1", "q2", "q3"),
) -> list[dict]:
    g = build_graph(spark, "UK", scale=scale, k=k)
    capacity_units = int(
        CACHE_FRACTION * graph_bytes(g) / g.k / BYTES_PER_VID
    )
    rows = []
    try:
        for qname in queries:
            run = run_system("HUGE", QUERIES[qname], g, trace_limit=trace_limit)
            traces = batched_traces(run.traces, g.k)
            # The trace is a capped sample of the run's remote accesses;
            # extrapolate the replayed cache time linearly to the full
            # access volume (remote share of pull-op accesses).
            remote_est = sum(
                o.accesses * (g.k - 1) / g.k
                for o in run.stats.ops
                if o.pull_requests > 0
            )
            factor = max(1.0, remote_est / max(1, len(run.traces)))
            base_s = run.stats.measured_wall_s
            results = replay_all(traces, capacity_units=capacity_units)
            row: dict = {"query": qname, "results": run.stats.result_count}
            for name in VARIANTS:
                row[name] = round(base_s + factor * results[name].sim_s, 3)
            row["LRBU_tf"] = round(factor * results["LRBU"].fetch_s, 3)
            row["LRBU_hits"] = results["LRBU"].hits
            row["LRBU_misses"] = results["LRBU"].misses
            rows.append(row)
    finally:
        g.unpersist()
    return rows
