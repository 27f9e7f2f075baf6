"""Logical plans of prior systems in the join-based framework (§3.1).

Every baseline is a constrained instance of HUGE's plan space
(Table 2):

- **StarJoin**: greedy maximal-star decomposition, left-deep, hash join,
  pushing.
- **SEED**: bushy DP over stars, hash join, pushing (we use the paper's
  index-free setting; Exp-1 notes HUGE-SEED computes cliques via
  PULL-EXTEND instead of SEED's triangle index).
- **BiGJoin**: left-deep complete-star joins along a matching order, wco
  join, pushing.
- **BENU**: BiGJoin's logical plan with pulling (plus the external
  key/value-store overhead model at execution time).
- **RADS**: multi-round "star-expand-and-verify" — expand by a star
  rooted at an already-matched vertex, then verify the remaining edges
  (1-stars); hash join, pulling, region groups at execution time.

``huge_variant`` re-derives Equation-3 physical settings for any
baseline's logical plan — the paper's Exp-1 "plug existing algorithms
into HUGE" mode (Remark 3.2).
"""
from __future__ import annotations

from repro.core.optimizer import (
    EH_CONFIG,
    GF_CONFIG,
    HUGE_CONFIG,
    SEED_CONFIG,
    left_deep_plan,
    optimal_plan,
    starjoin_decomposition,
    wco_plan,
)
from repro.core.plan import CommMode, JoinAlgo, PlanNode
from repro.graphs.queries import QueryGraph, SubQuery
from repro.graphs.storage import GraphStats


def rads_plan(q: QueryGraph) -> PlanNode:
    """RADS' star-expand-and-verify paradigm as a left-deep plan.

    Round structure (§3.1 "RADS"): start from the maximal star at the
    highest-degree vertex; while unmatched vertices remain, expand by
    the star rooted at the *matched* vertex with the most unmatched
    neighbours; finally join the leftover edges (1-stars between matched
    vertices — the edge-verification step). All joins are pulling-based
    hash joins (Table 2)."""
    root0 = min(range(q.n_vertices), key=lambda v: (-q.degree(v), v))
    units: list[SubQuery] = [
        q.subquery(frozenset(tuple(sorted((root0, u))) for u in q.adj[root0]))
    ]
    matched = set(q.adj[root0]) | {root0}
    covered = set(units[0].edges)
    while matched != set(range(q.n_vertices)):
        root = min(
            (v for v in matched if q.adj[v] - matched),
            key=lambda v: (-len(q.adj[v] - matched), v),
        )
        star = frozenset(tuple(sorted((root, u))) for u in q.adj[root] - matched)
        units.append(q.subquery(star))
        matched |= q.adj[root] - matched
        covered |= star
    for e in sorted(q.edges - covered):  # verification edges, one unit each
        units.append(q.subquery(frozenset({e})))
    return left_deep_plan(q, units, JoinAlgo.HASH, CommMode.PULL)


def logical_units(plan: PlanNode) -> list[SubQuery]:
    return plan.leaves()


def huge_variant(plan: PlanNode) -> PlanNode:
    """Re-run Equation 3 on an existing logical plan (Exp-1: HUGE-X)."""
    if plan.is_leaf:
        return plan
    return PlanNode.join(plan.query, huge_variant(plan.left), huge_variant(plan.right))


def baseline_plan(system: str, q: QueryGraph, stats: GraphStats, k: int) -> PlanNode:
    """The named system's logical+physical plan for ``q``."""
    system = system.upper()
    if system == "HUGE":
        return optimal_plan(q, stats, k, HUGE_CONFIG)
    if system == "SEED":
        return optimal_plan(q, stats, k, SEED_CONFIG)
    if system == "STARJOIN":
        return left_deep_plan(
            q, starjoin_decomposition(q), JoinAlgo.HASH, CommMode.PUSH
        )
    if system == "BIGJOIN":
        return wco_plan(q, CommMode.PUSH)
    if system == "BENU":
        return wco_plan(q, CommMode.PULL)
    if system == "RADS":
        return rads_plan(q)
    if system == "HUGE-WCO":
        return wco_plan(q, CommMode.PULL)
    if system == "HUGE-BENU":
        return huge_variant(wco_plan(q, CommMode.PULL))
    if system == "HUGE-SEED":
        return huge_variant(optimal_plan(q, stats, k, SEED_CONFIG))
    if system == "HUGE-RADS":
        return huge_variant(rads_plan(q))
    if system == "HUGE-EH":
        return optimal_plan(q, stats, k, EH_CONFIG)
    if system == "HUGE-GF":
        return optimal_plan(q, stats, k, GF_CONFIG)
    raise ValueError(f"unknown system {system}")
