"""End-to-end system runner: plan -> dataflow -> engine -> T/C/M row.

Couples each system's logical plan (``plans.py``) with its execution
constraints and memory model:

- pushing BFS systems (StarJoin, SEED, BiGJoin, and RADS' materialised
  rounds) hold whole join operands live -> live-set walk over the
  measured operator outputs;
- HUGE (and HUGE-X variants) runs under the BFS/DFS-adaptive scheduler
  -> scheduler-simulated peak (Theorem 5.4-bounded) plus the pull
  cache, plus the constant PUSH-JOIN spill buffer (§4.3);
- BENU runs DFS (queue capacity = one batch) plus its local cache.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.baselines.plans import baseline_plan
from repro.core.accounting import BYTES_PER_VID, RunStats
from repro.core.dataflow import OpNode, translate
from repro.core.engine import EngineOptions, ExecResult, execute
from repro.core.plan import PlanNode
from repro.graphs.queries import QueryGraph
from repro.graphs.storage import DataGraph
from repro.sched.scheduler import SimOp, simulate

CACHE_FRACTION = 0.30  # paper default: cache capacity = 30% of the graph
JOIN_BUFFER_BYTES = 8 << 20  # §4.3 constant in-memory buffer per PUSH-JOIN
DEFAULT_BATCH = 4096.0  # mini-scale twin of the paper's 512K batch
DEFAULT_QUEUE_CAP = 4e5  # mini-scale twin of the paper's 5e7 output queue
RADS_REGION_GROUPS = 32  # per-machine pivot subdivisions (re-pull per region)


@dataclass(frozen=True)
class SystemSpec:
    """How a named system executes on the shared engine."""

    name: str
    native_pull_join: bool = False
    kv_model: bool = False
    region_groups: int = 1
    memory: str = "adaptive"  # adaptive | bfs | dfs


SYSTEMS: dict[str, SystemSpec] = {
    "HUGE": SystemSpec("HUGE"),
    "SEED": SystemSpec("SEED", memory="bfs"),
    "BIGJOIN": SystemSpec("BIGJOIN", memory="bfs"),
    "STARJOIN": SystemSpec("STARJOIN", memory="bfs"),
    "BENU": SystemSpec("BENU", kv_model=True, memory="dfs"),
    "RADS": SystemSpec(
        "RADS", native_pull_join=True, region_groups=RADS_REGION_GROUPS, memory="bfs"
    ),
    "HUGE-WCO": SystemSpec("HUGE-WCO"),
    "HUGE-BENU": SystemSpec("HUGE-BENU"),
    "HUGE-SEED": SystemSpec("HUGE-SEED"),
    "HUGE-RADS": SystemSpec("HUGE-RADS"),
    "HUGE-EH": SystemSpec("HUGE-EH"),
    "HUGE-GF": SystemSpec("HUGE-GF"),
}


@dataclass
class SystemRun:
    system: str
    plan: PlanNode
    flow: OpNode
    stats: RunStats
    traces: list[tuple[int, int, int]] = field(default_factory=list)

    def table_row(self) -> dict:
        return self.stats.table_row(self.system)


def graph_bytes(g: DataGraph) -> float:
    """In-memory CSR size of the partitioned graph (both directions)."""
    return (4.0 * g.n_edges + g.n_vertices) * BYTES_PER_VID


def run_system(
    system: str,
    q: QueryGraph,
    g: DataGraph,
    *,
    trace_limit: int = 0,
    batch: float = DEFAULT_BATCH,
    queue_cap: float = DEFAULT_QUEUE_CAP,
    warmups: int = 1,
    repeats: int = 1,
) -> SystemRun:
    """Execute ``system`` on query ``q`` over ``g`` and fill in T/C/M.

    ``warmups`` unmeasured executions precede the measured ones so JVM
    JIT warm-up does not pollute the cross-system wall-time comparison
    (all systems share one Spark session); of ``repeats`` measured
    executions the one with the smallest wall time is kept (local-mode
    wall times are noisy; accounting stats are identical across runs)."""
    spec = SYSTEMS[system.upper()]
    plan = baseline_plan(spec.name, q, g.stats, g.k)
    flow = translate(plan, native_pull_join=spec.native_pull_join)
    opts = EngineOptions(
        kv_model=spec.kv_model,
        region_groups=spec.region_groups,
        trace_limit=trace_limit,
    )
    for _ in range(warmups):
        execute(flow, q, g, opts).cleanup()
    res: ExecResult = execute(flow, q, g, opts)
    res.cleanup()
    for _ in range(max(0, repeats - 1)):
        again = execute(flow, q, g, opts)
        again.cleanup()
        if again.stats.measured_wall_s < res.stats.measured_wall_s:
            res = again
    stats = res.stats
    stats.peak_mem_bytes = _peak_memory(spec, flow, stats, g, batch, queue_cap)
    return SystemRun(spec.name, plan, flow, stats, res.traces)


# ---------------------------------------------------------------------------
# Memory models
# ---------------------------------------------------------------------------


def _peak_memory(
    spec: SystemSpec,
    flow: OpNode,
    stats: RunStats,
    g: DataGraph,
    batch: float,
    queue_cap: float,
) -> float:
    pull_system = spec.memory != "bfs"
    cache = CACHE_FRACTION * graph_bytes(g) / g.k if pull_system else 0.0
    if spec.memory == "bfs":
        return bfs_peak_bytes(flow, stats) / g.k
    cap = batch if spec.memory == "dfs" else queue_cap
    return segmented_adaptive_peak(flow, stats, batch, cap) / g.k + cache


def bfs_peak_bytes(flow: OpNode, stats: RunStats) -> float:
    """BFS execution holds an operator's output until its consumer has
    run: max over time of live intermediate bytes (whole cluster)."""
    ops = flow.ops()
    assert len(ops) == len(stats.ops), "stats misaligned with dataflow"
    parent = [len(ops)] * len(ops)  # root's output is the final result
    index = {id(n): i for i, n in enumerate(ops)}
    for i, n in enumerate(ops):
        for c in n.children:
            parent[index[id(c)]] = i
    peak = 0.0
    for j in range(len(ops)):
        live = stats.ops[j].out_bytes
        live += sum(
            stats.ops[i].out_bytes for i in range(j) if parent[i] >= j
        )
        peak = max(peak, live)
    return peak


def segmented_adaptive_peak(
    flow: OpNode, stats: RunStats, batch: float, queue_cap: float
) -> float:
    """Adaptive/DFS peak over each join-free line segment of the dataflow
    (joins are barrier-synchronised, §5.4, with constant spill buffers)."""
    ops = flow.ops()
    index = {id(n): i for i, n in enumerate(ops)}
    peak = 0.0
    n_joins = 0

    def segments(node: OpNode) -> list[list[int]]:
        """Maximal chains of non-join ops, as indices into ops()."""
        segs: list[list[int]] = []

        def walk(n: OpNode) -> list[int]:
            if n.kind == "join":
                nonlocal n_joins
                n_joins += 1
                for c in n.children:
                    segs.append(walk(c))
                return []
            if not n.children:
                return [index[id(n)]]
            chain = walk(n.children[0])
            chain.append(index[id(n)])
            return chain

        segs.append(walk(node))
        return [s for s in segs if s]

    for seg in segments(flow):
        src = float(stats.ops[seg[0]].out_rows)
        sims = []
        prev = src
        for i in seg[1:]:
            o = stats.ops[i]
            sims.append(SimOp(o.name, (o.out_rows / prev) if prev else 0.0, o.out_arity))
            prev = float(o.out_rows)
        sim = simulate(src, sims, batch=batch, queue_cap=queue_cap)
        peak = max(peak, sim.peak_mem_bytes)
    return peak + n_joins * JOIN_BUFFER_BYTES
