"""Two-layer intra-/inter-machine work stealing (§5.3) — event simulation.

The paper's Exp-8 measures load balance as the standard deviation of
per-worker busy time, comparing HUGE (two-layer stealing) against
HUGE-NOSTL (static pivot-vertex distribution, as BENU) and HUGE-RGP
(RADS' region groups). Balance is a pure scheduling property of the
task-cost sequence, so we reproduce it with a discrete-event simulator
over real (or synthetic power-law) per-pivot task costs.

Policies:

- ``nostl``  — tasks statically bound to the worker owning their pivot;
- ``rgp``    — tasks grouped into region groups, groups statically
  round-robined to workers (coarser granularity, same staticness);
- ``steal``  — HUGE: idle workers first steal half the deque of the
  most loaded worker on their machine, then batches from the most
  loaded remote machine (StealWork RPC), each steal paying an overhead.
"""
from __future__ import annotations

import heapq
from dataclasses import dataclass

import numpy as np

INTRA_STEAL_S = 20e-6  # deque steal (half the victim's tasks)
INTER_STEAL_S = 500e-6  # StealWork RPC (a batch of partial results)


@dataclass
class BalanceResult:
    policy: str
    makespan_s: float
    stddev_s: float  # std dev of per-worker busy time (paper's metric)
    total_cpu_s: float  # aggregated busy time incl. stealing overhead
    steals: int


def _finish_stats(busy: np.ndarray, steals: int, policy: str) -> BalanceResult:
    return BalanceResult(
        policy=policy,
        makespan_s=float(busy.max()),
        stddev_s=float(busy.std()),
        total_cpu_s=float(busy.sum()),
        steals=steals,
    )


def simulate_static(
    task_costs_s: np.ndarray, owners: np.ndarray, n_workers: int, policy: str
) -> BalanceResult:
    """Static policies: each worker's busy time is the sum of its tasks."""
    busy = np.zeros(n_workers)
    np.add.at(busy, owners % n_workers, task_costs_s)
    return _finish_stats(busy, 0, policy)


def balance_nostl(
    task_costs_s: np.ndarray, pivot_ids: np.ndarray, n_workers: int
) -> BalanceResult:
    """BENU-style: load distributed by the firstly-matched (pivot) vertex."""
    return simulate_static(task_costs_s, pivot_ids, n_workers, "nostl")


def balance_rgp(
    task_costs_s: np.ndarray,
    pivot_ids: np.ndarray,
    n_workers: int,
    *,
    groups_per_worker: int = 4,
) -> BalanceResult:
    """RADS-style region groups: contiguous pivot ranges round-robined."""
    n_groups = n_workers * groups_per_worker
    return simulate_static(task_costs_s, pivot_ids % n_groups, n_workers, "rgp")


def balance_steal(
    task_costs_s: np.ndarray,
    pivot_ids: np.ndarray,
    n_workers: int,
    *,
    workers_per_machine: int = 4,
) -> BalanceResult:
    """HUGE: two-layer stealing via an idle-driven event simulation.

    Workers process their own deque back-to-front; an idle worker steals
    half the largest local deque, else a batch from the most loaded
    remote machine. Deques hold task indices; costs are real numbers.
    """
    deques: list[list[int]] = [[] for _ in range(n_workers)]
    for i, p in enumerate(pivot_ids):
        deques[int(p) % n_workers].append(i)
    busy = np.zeros(n_workers)
    steals = 0
    # Event queue of (time_free, worker). All start at t=0.
    heap = [(0.0, w) for w in range(n_workers)]
    heapq.heapify(heap)
    machine = lambda w: w // workers_per_machine  # noqa: E731
    while heap:
        t, w = heapq.heappop(heap)
        if not deques[w]:
            # Intra-machine steal: largest deque on my machine.
            m = machine(w)
            local = [
                x
                for x in range(n_workers)
                if machine(x) == m and x != w and len(deques[x]) > 1
            ]
            victim = max(local, key=lambda x: len(deques[x]), default=None)
            overhead = INTRA_STEAL_S
            if victim is None:
                # Never steal a victim's *last* task (len > 1): a lone
                # task is about to be processed by its holder, and
                # grabbing it livelocks the endgame with tasks bouncing
                # between idle thieves forever.
                remote = [
                    x
                    for x in range(n_workers)
                    if machine(x) != m and len(deques[x]) > 1
                ]
                victim = max(remote, key=lambda x: len(deques[x]), default=None)
                overhead = INTER_STEAL_S
            if victim is None:
                continue  # nothing left anywhere: worker terminates
            half = max(1, len(deques[victim]) // 2)
            deques[w], deques[victim] = (
                deques[victim][:half],
                deques[victim][half:],
            )
            steals += 1
            busy[w] += overhead
            heapq.heappush(heap, (t + overhead, w))
            continue
        task = deques[w].pop()
        c = float(task_costs_s[task])
        busy[w] += c
        heapq.heappush(heap, (t + c, w))
    return _finish_stats(busy, steals, "steal")


def powerlaw_task_costs(
    n_tasks: int, *, alpha: float = 1.8, base_s: float = 1e-4, seed: int = 0
) -> tuple[np.ndarray, np.ndarray]:
    """Synthetic per-pivot costs with power-law skew (hub vertices explode
    intermediate results — the paper's motivation for dynamic balancing)."""
    rng = np.random.default_rng(seed)
    costs = base_s * (1.0 + rng.pareto(alpha, n_tasks) * 10.0)
    pivots = rng.permutation(n_tasks)
    return costs, pivots
