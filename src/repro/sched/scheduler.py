"""BFS/DFS-adaptive scheduler (Algorithm 5) — discrete simulation.

The engine executes operators whole (Spark is a BFS dataflow runtime);
*scheduling* determines how much intermediate state is ever live at
once, which is what the paper's memory claims are about. We therefore
simulate Algorithm 5 over the measured dataflow: each operator has a
per-input expansion ratio (out_rows / in_rows, measured by the engine),
a fixed-capacity output queue, and processes one batch per step.

The simulation reproduces:

- the scheduler walk itself: schedule an operator, consume batches until
  its output queue fills or its input drains, yield, move to the
  successor (or backtrack from SINK / an empty input, Algorithm 5);
- **peak memory** — max total queued tuples over time; queue overflow by
  at most one batch's results (Lemma 5.2's argument);
- **makespan** — batch processing cost plus a per-scheduling-switch
  overhead, so tiny queues (DFS-style) pay many switches (Exp-7's
  left side) while huge queues (BFS-style) blow memory (right side).

``queue_cap=None`` means unbounded (pure BFS); ``queue_cap <= batch``
degenerates to DFS.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.accounting import BYTES_PER_VID, RunStats

SWITCH_OVERHEAD_S = 2e-3  # yield + schedule broadcast per switch
PROC_S_PER_TUPLE = 30e-9  # operator processing cost per output tuple


@dataclass(frozen=True)
class SimOp:
    """One operator of a line dataflow as the simulator sees it."""

    name: str
    ratio: float  # output tuples per input tuple (measured)
    arity: int  # tuple width, for byte accounting


@dataclass
class SimResult:
    peak_mem_tuples: float
    peak_mem_bytes: float
    switches: int
    sim_s: float
    sunk: float  # tuples delivered to SINK


def line_ops_from_stats(stats: RunStats) -> tuple[float, list[SimOp]]:
    """Derive (source tuples, per-op ratios) from measured engine stats.

    Valid for join-free dataflows (a line of scan + extends — exactly
    the shape HUGE schedules adaptively; PUSH-JOIN segments are
    barrier-synchronised separately, §5.4)."""
    ops = stats.ops
    if not ops:
        raise ValueError("no operators")
    src = float(ops[0].out_rows)
    sims: list[SimOp] = []
    prev = src
    for o in ops[1:]:
        ratio = (o.out_rows / prev) if prev > 0 else 0.0
        sims.append(SimOp(o.name, ratio, o.out_arity))
        prev = float(o.out_rows)
    return src, sims


def simulate(
    n_source: float,
    ops: list[SimOp],
    *,
    batch: float,
    queue_cap: float | None,
    source_arity: int = 2,
) -> SimResult:
    """Run Algorithm 5 over a line dataflow ``SCAN -> ops... -> SINK``."""
    n = len(ops)
    queues = [0.0] * (n + 1)  # queues[i] = output queue of op i (0 = scan)
    remaining_scan = float(n_source)
    peak = 0.0
    switches = 0
    t = 0.0
    sunk = 0.0
    cap = float("inf") if queue_cap is None else float(queue_cap)

    def mem() -> float:
        return sum(queues)

    cur = 0  # 0 = SCAN, 1..n = ops, n+1 = SINK
    guard = 0
    while remaining_scan > 0 or any(qv > 0 for qv in queues):
        guard += 1
        if guard > 10_000_000:  # pragma: no cover - safety valve
            raise RuntimeError("scheduler simulation did not terminate")
        switches += 1
        t += SWITCH_OVERHEAD_S
        if cur == n + 1:  # SINK consumes everything, then backtrack
            sunk += queues[n]
            t += queues[n] * PROC_S_PER_TUPLE
            queues[n] = 0.0
            cur = n
            continue
        produced_any = False
        while True:
            if queues[cur] >= cap:
                break  # output queue full -> yield (line 9)
            if cur == 0:
                if remaining_scan <= 0:
                    break
                take = min(batch, remaining_scan)
                remaining_scan -= take
                queues[0] += take
                t += take * PROC_S_PER_TUPLE
            else:
                if queues[cur - 1] <= 0:
                    break  # input empty -> yield
                take = min(batch, queues[cur - 1])
                queues[cur - 1] -= take
                out = take * ops[cur - 1].ratio
                queues[cur] += out
                t += max(take, out) * PROC_S_PER_TUPLE
            produced_any = True
            peak = max(peak, mem())
        if queues[cur] > 0 or cur == 0 and produced_any:
            cur = cur + 1  # successor has work
        elif cur > 0 and queues[cur - 1] <= 0 and not produced_any:
            cur = cur - 1  # backtrack to precursor (line 4)
        else:
            cur = cur + 1
    bytes_peak = peak * (max((o.arity for o in ops), default=source_arity)) * BYTES_PER_VID
    return SimResult(peak, bytes_peak, switches, t, sunk)


def adaptive_peak_bytes(
    stats: RunStats,
    *,
    batch: float = 512e3,
    queue_cap: float | None = 5e7,
    cache_bytes: float = 0.0,
) -> float:
    """Per-machine peak memory of the BFS/DFS-adaptive schedule of a
    line dataflow (plus the pull cache), from measured cardinalities."""
    src, ops = line_ops_from_stats(stats)
    sim = simulate(src, ops, batch=batch, queue_cap=queue_cap)
    return sim.peak_mem_bytes / max(1, stats.k) + cache_bytes


def theorem54_bound_bytes(n_query_vertices: int, d_max: int, batch: float) -> float:
    """Theorem 5.4: O(|Vq|^2 * D_G) tuples of width |Vq| per batch unit."""
    return (n_query_vertices**2) * d_max * batch / 512e3 * BYTES_PER_VID
