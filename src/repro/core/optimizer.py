"""Algorithm 1: dynamic-programming optimiser for the execution plan.

Searches all bushy join trees over connected edge-subsets of the query
graph, with stars as join units, minimising estimated computation +
communication cost. Pulling-mode joins (Equation 3) cost at most
``k * |E_G|`` transferred units; pushing-mode joins cost the shuffled
operand sizes ``|R(q_l)| + |R(q_r)|`` (Remark 3.1 / Algorithm 1 lines
7-9).

Configurable restrictions let the same DP emit the *constrained* plans
of prior systems (Table 2): SEED = bushy + hash/push only; StarJoin and
RADS use the greedy maximal-star decomposition (their published
heuristic); EmptyHeaded/GraphFlow-style hybrid plans use compute-only
objectives (Exp-9 / Table 6).
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.cardinality import estimate
from repro.core.plan import CommMode, JoinAlgo, PlanNode, configure, orient
from repro.graphs.queries import QueryGraph, SubQuery
from repro.graphs.storage import GraphStats


@dataclass(frozen=True)
class OptimizerConfig:
    """Search-space / cost-model knobs (defaults = HUGE's optimiser)."""

    left_deep: bool = False  # restrict to left-deep trees (right child = unit)
    force_push: bool = False  # physical = (hash, push) for every join (SEED)
    objective: str = "huge"  # huge | compute_sum | compute_max


HUGE_CONFIG = OptimizerConfig()
SEED_CONFIG = OptimizerConfig(force_push=True)
EH_CONFIG = OptimizerConfig(objective="compute_max")  # EmptyHeaded: min-max width
GF_CONFIG = OptimizerConfig(objective="compute_sum")  # GraphFlow: min total size


def optimal_plan(
    q: QueryGraph,
    stats: GraphStats,
    k: int,
    cfg: OptimizerConfig = HUGE_CONFIG,
) -> PlanNode:
    """Compute the optimal plan for ``q`` under ``cfg`` (Algorithm 1)."""
    edges = sorted(q.edges)
    m = len(edges)
    bit = {e: 1 << i for i, e in enumerate(edges)}

    def sub_of(mask: int) -> SubQuery:
        return q.subquery(frozenset(e for e in edges if bit[e] & mask))

    # Enumerate connected edge subsets once.
    subs: dict[int, SubQuery] = {}
    for mask in range(1, 1 << m):
        s = sub_of(mask)
        if s.is_connected():
            subs[mask] = s

    est_cache: dict[int, float] = {
        mask: estimate(s, stats) for mask, s in subs.items()
    }
    cost: dict[int, float] = {}
    best: dict[int, tuple[int, int]] = {}

    for mask in sorted(subs, key=lambda x: x.bit_count()):
        s = subs[mask]
        if s.is_star():
            cost[mask] = est_cache[mask]  # join unit: computation only (line 4)
            continue
        c_best, choice = None, None
        for lmask in _proper_submasks(mask):
            rmask = mask ^ lmask
            if lmask > rmask:
                continue  # each unordered split once; orientation handled below
            if lmask not in cost or rmask not in cost:
                continue
            for l, r in ((lmask, rmask), (rmask, lmask)):
                if cfg.left_deep and not subs[r].is_star():
                    continue
                c = _join_cost(
                    cfg, k, stats, est_cache[mask], cost[l], cost[r],
                    est_cache[l], est_cache[r], subs[l], subs[r],
                )
                if c_best is None or c < c_best:
                    c_best, choice = c, (l, r)
        if c_best is not None:
            cost[mask] = c_best
            best[mask] = choice

    full = (1 << m) - 1
    if full not in cost:
        raise ValueError(f"no plan found for {q.name} under {cfg}")

    def build(mask: int) -> PlanNode:
        s = subs[mask]
        if mask not in best:
            return PlanNode.leaf(s)
        lmask, rmask = best[mask]
        lnode, rnode = build(lmask), build(rmask)
        if cfg.force_push:
            return PlanNode.join(s, lnode, rnode, JoinAlgo.HASH, CommMode.PUSH)
        return PlanNode.join(s, lnode, rnode)  # Equation 3 via orient/configure

    plan = build(full)
    plan._validate_node()
    return plan


def _join_cost(
    cfg: OptimizerConfig,
    k: int,
    stats: GraphStats,
    est_q: float,
    cost_l: float,
    cost_r: float,
    est_l: float,
    est_r: float,
    sub_l: SubQuery,
    sub_r: SubQuery,
) -> float:
    if cfg.objective == "compute_max":
        return max(cost_l, cost_r, est_q)
    if cfg.objective == "compute_sum":
        return cost_l + cost_r + est_q
    # HUGE objective: computation + communication (Algorithm 1 lines 6-9).
    c = cost_l + cost_r + est_q
    if cfg.force_push:
        return c + est_l + est_r
    l, r = orient(sub_l, sub_r)
    _, comm = configure(l, r)
    if comm is CommMode.PULL:
        return c + k * stats.n_edges
    return c + est_l + est_r


def _proper_submasks(mask: int):
    sub = (mask - 1) & mask
    while sub:
        yield sub
        sub = (sub - 1) & mask


# ---------------------------------------------------------------------------
# Greedy maximal-star decomposition (StarJoin's heuristic, reused by RADS).
# ---------------------------------------------------------------------------


def starjoin_decomposition(q: QueryGraph) -> list[SubQuery]:
    """Greedy vertex-cover star decomposition: repeatedly root a star at
    the vertex with the most uncovered edges. This is StarJoin's plan
    (and the shape of RADS' star-expand rounds) — deliberately poor for
    dense queries because it materialises large stars."""
    remaining = set(q.edges)
    units: list[SubQuery] = []
    while remaining:
        counts: dict[int, int] = {}
        for a, b in remaining:
            counts[a] = counts.get(a, 0) + 1
            counts[b] = counts.get(b, 0) + 1
        root = min(counts, key=lambda v: (-counts[v], v))
        star_edges = frozenset(e for e in remaining if root in e)
        units.append(q.subquery(star_edges))
        remaining -= star_edges
    return units


def left_deep_plan(
    q: QueryGraph,
    units: list[SubQuery],
    algo: JoinAlgo,
    comm: CommMode,
) -> PlanNode:
    """Chain join units left-deep with a fixed physical setting, ordering
    units so every prefix is connected (required for a valid join)."""
    ordered = _connected_order(units)
    node = PlanNode.leaf(ordered[0])
    acc = set(ordered[0].edges)
    for u in ordered[1:]:
        acc |= u.edges
        node = PlanNode.join(q.subquery(frozenset(acc)), node, PlanNode.leaf(u), algo, comm)
    return node


def _connected_order(units: list[SubQuery]) -> list[SubQuery]:
    rest = list(units)
    out = [rest.pop(0)]
    verts = set(out[0].vertices)
    while rest:
        i = next(
            (j for j, u in enumerate(rest) if u.vertices & verts),
            None,
        )
        if i is None:
            raise ValueError("units do not connect")
        u = rest.pop(i)
        verts |= u.vertices
        out.append(u)
    return out


# ---------------------------------------------------------------------------
# BiGJoin / BENU: left-deep complete-star-join plans from a vertex order.
# ---------------------------------------------------------------------------


def wco_vertex_order(q: QueryGraph) -> list[int]:
    """BiGJoin's matching order: start at the highest-degree vertex, then
    greedily append the vertex most connected to the matched prefix."""
    order = [min(range(q.n_vertices), key=lambda v: (-q.degree(v), v))]
    while len(order) < q.n_vertices:
        chosen = min(
            (v for v in range(q.n_vertices) if v not in order),
            key=lambda v: (-len(q.adj[v] & set(order)), -q.degree(v), v),
        )
        if not q.adj[chosen] & set(order):
            raise ValueError("query graph disconnected")
        order.append(chosen)
    return order


def wco_plan(
    q: QueryGraph,
    comm: CommMode,
    order: list[int] | None = None,
) -> PlanNode:
    """Left-deep plan of complete star joins following a matching order:
    the i-th join extends the matched prefix by one vertex via the star
    rooted at it with leaves = its already-matched neighbours (§3.1,
    Example 3.1). ``comm=push`` is BiGJoin; ``comm=pull`` is BENU /
    HUGE-WCO."""
    order = order or wco_vertex_order(q)
    first = {order[0], order[1]}
    if not q.has_edge(order[0], order[1]):
        raise ValueError("first two vertices in order must share an edge")
    acc = {tuple(sorted((order[0], order[1])))}
    node = PlanNode.leaf(q.subquery(frozenset(acc)))
    for v in order[2:]:
        star_edges = frozenset(
            tuple(sorted((v, u))) for u in q.adj[v] if u in first
        )
        if not star_edges:
            raise ValueError("matching order leaves a disconnected vertex")
        unit = q.subquery(star_edges)
        acc |= star_edges
        node = PlanNode.join(
            q.subquery(frozenset(acc)), node, PlanNode.leaf(unit), JoinAlgo.WCO, comm
        )
        first.add(v)
    return node
