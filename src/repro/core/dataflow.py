"""Dataflow graph: the operator DAG HUGE's engine executes (§4.2).

Operators (mirroring the paper's SCAN / PULL-EXTEND / PUSH-JOIN / SINK):

- ``scan_edge`` — SCAN of a single-edge join unit (the §5.2 SCAN rewrite
  reduces every star scan to an edge scan plus extends);
- ``extend`` — PULL-EXTEND(Ext): adds one query vertex whose candidates
  are the intersection of the neighbours of the matched Ext vertices
  (Equation 2). ``comm`` distinguishes HUGE's pulling extend from
  BiGJoin's pushing wco extend (prefixes shipped to each leaf's owner);
- ``verify`` — the §5.2 "hint" extend: checks the edges between an
  *already matched* vertex and the Ext vertices, adding no column;
- ``join`` — hash join of the two child flows on their shared query
  vertices. ``comm=push`` shuffles both operands (PUSH-JOIN);
  ``comm=pull`` is RADS' native pulling hash join (star operand built
  from pulled adjacency, partial results stay put), accounted per
  region group.

A SINK is implicit: the engine counts (or returns) the root's output.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.core.plan import (
    CommMode,
    JoinAlgo,
    PlanNode,
    complete_star_root,
    pull_hash_root,
)
from repro.graphs.queries import SubQuery


@dataclass
class OpNode:
    """One operator in the dataflow DAG (children feed this op)."""

    kind: str  # scan_edge | extend | verify | join
    sub: SubQuery  # the sub-query whose matches this op outputs
    children: list["OpNode"] = field(default_factory=list)
    target: int | None = None  # extend: new vertex; verify: checked vertex
    ext: tuple[int, ...] = ()  # extend/verify: matched intersection dims
    comm: CommMode = CommMode.PULL
    region_root: int | None = None  # RADS pull-join: star root (region pivot)

    def ops(self) -> list["OpNode"]:
        """All operators, bottom-up (execution order for a line/tree)."""
        out: list[OpNode] = []
        for c in self.children:
            out.extend(c.ops())
        out.append(self)
        return out

    def describe(self, indent: int = 0) -> str:
        pad = "  " * indent
        label = f"{pad}{self.kind.upper()}"
        if self.kind in ("extend", "verify"):
            label += f"(v{self.target}; ext={self.ext}, {self.comm.value})"
        elif self.kind == "join":
            label += f"({self.comm.value})"
        label += f" -> {self.sub.name}\n"
        return label + "".join(c.describe(indent + 1) for c in self.children)


def translate(plan: PlanNode, *, native_pull_join: bool = False) -> OpNode:
    """Algorithm 2: execution plan -> dataflow graph.

    ``native_pull_join=False`` (HUGE) rewrites every pulling hash join
    into a chain of PULL-EXTEND/verify operators for bounded memory
    (§5.2); ``True`` (RADS) keeps it as a materialised pulling hash
    join.
    """
    if plan.is_leaf:
        return _scan_star(plan.query)

    left = translate(plan.left, native_pull_join=native_pull_join)
    rq = plan.right.query

    if plan.algo is JoinAlgo.WCO:
        # Complete star join -> one PULL-EXTEND (Example 4.1). BiGJoin's
        # pushing wco join is the same operator with comm=push.
        root = complete_star_root(plan.left.query, rq)
        if root is None:
            raise ValueError(f"wco join at {plan.query.name} is not a complete star join")
        leaves = tuple(sorted(rq.vertices - {root}))
        # If every vertex of the star is already matched on the left, the
        # "extension" only closes edges between matched vertices: a verify.
        kind = "verify" if root in plan.left.query.vertices else "extend"
        return OpNode(
            kind, plan.query, [left], target=root, ext=leaves, comm=plan.comm
        )

    if plan.comm is CommMode.PULL:
        if native_pull_join:  # RADS: materialise the star and hash join
            right = _scan_star(rq)
            return OpNode(
                "join", plan.query, [left, right],
                comm=CommMode.PULL, region_root=pull_hash_root(plan.left.query, rq),
            )
        return _pull_hash_rewrite(plan, left)

    right = translate(plan.right, native_pull_join=native_pull_join)
    return OpNode("join", plan.query, [left, right], comm=CommMode.PUSH)


def _scan_star(unit: SubQuery) -> OpNode:
    """§5.2 SCAN rewrite: star (v; L) = edge scan + (|L|-1) local extends
    rooted at v (their adjacency accesses are owner-local by design)."""
    root = unit.star_root()
    if root is None:
        raise ValueError(f"join unit {unit.name} is not a star")
    leaves = sorted(unit.star_leaves())
    q = unit.parent
    first = q.subquery(frozenset({tuple(sorted((root, leaves[0])))}))
    node = OpNode("scan_edge", first, target=root)  # scan from the root's lists
    acc = set(first.edges)
    for leaf in leaves[1:]:
        acc.add(tuple(sorted((root, leaf))))
        node = OpNode(
            "extend", q.subquery(frozenset(acc)), [node],
            target=leaf, ext=(root,), comm=CommMode.PULL,
        )
    return node


def _pull_hash_rewrite(plan: PlanNode, left: OpNode) -> OpNode:
    """§5.2: pulling hash join (q', q'_l, (v_r; L)) as PULL-EXTEND chain.

    V1 = L ∩ V(q'_l) are already matched: one *verify* op checks the
    (v_r, v) edges for v ∈ V1 (the paper's hinted extend that keeps only
    f(v'_r) = u_{i+1}). Each v ∈ V2 = L \\ V1 is then grown by a fresh
    extend rooted at v_r.
    """
    rq, lq, q = plan.right.query, plan.left.query, plan.query.parent
    root = pull_hash_root(lq, rq)
    if root is None:
        raise ValueError(f"pulling hash join at {plan.query.name} violates C1")
    leaves = rq.vertices - {root}
    v1 = sorted(leaves & lq.vertices)
    v2 = sorted(leaves - lq.vertices)
    node = left
    acc = set(lq.edges)
    if v1:
        acc |= {tuple(sorted((root, v))) for v in v1}
        node = OpNode(
            "verify", q.subquery(frozenset(acc)), [node],
            target=root, ext=tuple(v1), comm=CommMode.PULL,
        )
    for v in v2:
        acc.add(tuple(sorted((root, v))))
        node = OpNode(
            "extend", q.subquery(frozenset(acc)), [node],
            target=v, ext=(root,), comm=CommMode.PULL,
        )
    return node
