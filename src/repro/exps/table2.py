"""Table 2: existing works and their execution plans (the taxonomy).

Paper:

| Work     | U (join unit)  | O (order) | A (algo)  | C (comm) |
|----------|----------------|-----------|-----------|----------|
| StarJoin | star           | left-deep | hash join | pushing  |
| SEED     | star & clique  | bushy     | hash join | pushing  |
| BiGJoin  | star (limited) | left-deep | wco join  | pushing  |
| BENU     | star (limited) | left-deep | wco join  | pulling  |
| RADS     | star           | left-deep | hash join | pulling  |

This table is definitional, but in our build it is *derivable*: each
baseline's plan generator emits actual plan trees, and this harness
inspects them (are all units stars? is the tree left-deep? which
algo/comm settings appear?) — so the taxonomy row is verified against
the code rather than transcribed. HUGE's own row (star units, bushy,
hybrid algo+comm) is derived the same way.
"""
from __future__ import annotations

from repro.baselines.plans import baseline_plan
from repro.graphs.queries import QUERIES, QueryGraph
from repro.graphs.storage import GraphStats

PAPER_ROWS = [
    {"work": "STARJOIN", "unit": "star", "order": "left-deep", "algo": "hash", "comm": "pushing"},
    {"work": "SEED", "unit": "star & clique", "order": "bushy", "algo": "hash", "comm": "pushing"},
    {"work": "BIGJOIN", "unit": "star (limited)", "order": "left-deep", "algo": "wco", "comm": "pushing"},
    {"work": "BENU", "unit": "star (limited)", "order": "left-deep", "algo": "wco", "comm": "pulling"},
    {"work": "RADS", "unit": "star", "order": "left-deep", "algo": "hash", "comm": "pulling"},
    {"work": "HUGE", "unit": "star", "order": "bushy", "algo": "hash+wco", "comm": "hybrid"},
]

# Degree moments of a generic power-law graph: only plan *shape* matters.
_GENERIC_STATS = GraphStats(
    10_000, 80_000, 600, 16.0,
    {1: 160_000.0, 2: 9.6e6, 3: 1.6e9, 4: 5.0e11, 5: 2.2e14},
)

WORKS = ["STARJOIN", "SEED", "BIGJOIN", "BENU", "RADS", "HUGE"]


def plan_taxonomy(work: str, queries: list[QueryGraph] | None = None, k: int = 10) -> dict:
    """Derive the Table-2 row of ``work`` by inspecting its actual plans."""
    # q7/q8 are included because hybrid plan spaces only diverge from pure
    # wco on path-heavy queries (Exp-9); without them HUGE's row would
    # degenerate to "left-deep, wco, pulling".
    queries = queries or [QUERIES[n] for n in ("q1", "q2", "q3", "q4", "q7", "q8")]
    units_all_stars = True
    left_deep = True
    algos: set[str] = set()
    comms: set[str] = set()
    for q in queries:
        plan = baseline_plan(work, q, _GENERIC_STATS, k)
        units_all_stars &= all(u.is_star() for u in plan.leaves())
        left_deep &= plan.is_left_deep()
        for j in plan.joins():
            algos.add(j.algo.value)
            comms.add(j.comm.value)
    return {
        "work": work,
        "unit": "star" if units_all_stars else "non-star",
        "order": "left-deep" if left_deep else "bushy",
        "algo": "+".join(sorted(algos)),
        "comm": "hybrid" if len(comms) > 1 else {"push": "pushing", "pull": "pulling"}[next(iter(comms))],
    }


def run_table2() -> list[dict]:
    """Derive every system's taxonomy row from its generated plans."""
    return [plan_taxonomy(w) for w in WORKS]
