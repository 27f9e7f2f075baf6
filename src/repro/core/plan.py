"""Execution plans: logical join trees + physical settings (Equation 3).

A plan is a binary tree over connected edge-subsets of the query graph
(:class:`~repro.graphs.queries.SubQuery`). Leaves are *join units*
(stars by default, §3.3); internal nodes are two-way joins
``(q', q'_l, q'_r)`` annotated with a join algorithm (``hash`` | ``wco``)
and a communication mode (``push`` | ``pull``) chosen by Equation 3:

- complete star join (right side is a star whose leaves are all matched
  on the left)                       -> (wco, pull)
- right side is a star whose root is matched on the left -> (hash, pull)
- otherwise                          -> (hash, push)
"""
from __future__ import annotations

from dataclasses import dataclass
from enum import Enum

from repro.graphs.queries import QueryGraph, SubQuery


class JoinAlgo(str, Enum):
    HASH = "hash"
    WCO = "wco"


class CommMode(str, Enum):
    PUSH = "push"
    PULL = "pull"


def complete_star_root(left: SubQuery, right: SubQuery) -> int | None:
    """Definition 3.1: right is a star (v_r; L) with L ⊆ V(left). Returns
    the root v_r (the *new* vertex the wco join extends by), or None.
    Single-edge stars admit either endpoint as root, so all valid roots
    are tried."""
    valid = [r for r in right.star_roots() if (right.vertices - {r}) <= left.vertices]
    if not valid:
        return None
    # Prefer a root that is a genuinely new vertex (the wco extension);
    # if every valid root is already matched, the join only verifies the
    # closing edge(s) between matched vertices.
    for r in valid:
        if r not in left.vertices:
            return r
    return valid[0]


def is_complete_star_join(left: SubQuery, right: SubQuery) -> bool:
    return complete_star_root(left, right) is not None


def pull_hash_root(left: SubQuery, right: SubQuery) -> int | None:
    """Property 3.1 C1: right is a star whose root is matched on the left.
    Returns that root, or None. (Eq. 3 only requires v_r ∈ V(q_l).)"""
    for r in right.star_roots():
        if r in left.vertices:
            return r
    return None


def is_pullable_hash_join(left: SubQuery, right: SubQuery) -> bool:
    return pull_hash_root(left, right) is not None


def configure(left: SubQuery, right: SubQuery) -> tuple[JoinAlgo, CommMode]:
    """Equation 3 physical configuration for the join (q', left, right)."""
    if is_complete_star_join(left, right):
        return (JoinAlgo.WCO, CommMode.PULL)
    if is_pullable_hash_join(left, right):
        return (JoinAlgo.HASH, CommMode.PULL)
    return (JoinAlgo.HASH, CommMode.PUSH)


def orient(left: SubQuery, right: SubQuery) -> tuple[SubQuery, SubQuery]:
    """Join is commutative (footnote 4): put the side that enables the
    cheapest Equation-3 setting on the right. Preference order:
    complete star join > pullable hash join > either."""
    for l, r in ((left, right), (right, left)):
        if is_complete_star_join(l, r):
            return l, r
    for l, r in ((left, right), (right, left)):
        if is_pullable_hash_join(l, r):
            return l, r
    return left, right


@dataclass(frozen=True)
class PlanNode:
    """A node of the (bushy) join tree."""

    query: SubQuery
    left: "PlanNode | None" = None
    right: "PlanNode | None" = None
    algo: JoinAlgo | None = None
    comm: CommMode | None = None

    @property
    def is_leaf(self) -> bool:
        return self.left is None

    @staticmethod
    def leaf(unit: SubQuery) -> "PlanNode":
        if not unit.is_star():
            raise ValueError(f"join unit must be a star: {unit.name}")
        return PlanNode(unit)

    @staticmethod
    def join(
        query: SubQuery,
        left: "PlanNode",
        right: "PlanNode",
        algo: JoinAlgo | None = None,
        comm: CommMode | None = None,
    ) -> "PlanNode":
        l, r = left, right
        if algo is None or comm is None:
            lq, rq = orient(l.query, r.query)
            if lq is r.query:  # orientation swapped the operands
                l, r = r, l
            algo, comm = configure(l.query, r.query)
        return PlanNode(query, l, r, algo, comm)

    # -- helpers -----------------------------------------------------------
    def validate(self, q: QueryGraph) -> None:
        """Structural sanity: children partition the parent's edges, every
        node is connected, leaves are stars, the root covers q."""
        if self.query.edges != (q.edges if self.query.parent is q else self.query.edges):
            pass  # root check done by caller via .query.edges == q.edges
        self._validate_node()

    def _validate_node(self) -> None:
        assert self.query.is_connected(), f"{self.query.name} disconnected"
        if self.is_leaf:
            assert self.query.is_star(), f"leaf {self.query.name} is not a star"
            return
        l, r = self.left, self.right
        assert l is not None and r is not None
        assert l.query.edges | r.query.edges == self.query.edges
        assert not (l.query.edges & r.query.edges), "children share edges"
        assert self.algo is not None and self.comm is not None
        l._validate_node()
        r._validate_node()

    def is_left_deep(self) -> bool:
        if self.is_leaf:
            return True
        return self.right.is_leaf and self.left.is_left_deep()

    def leaves(self) -> list[SubQuery]:
        if self.is_leaf:
            return [self.query]
        return self.left.leaves() + self.right.leaves()

    def joins(self) -> list["PlanNode"]:
        """All internal nodes, bottom-up left-to-right (the join order O)."""
        if self.is_leaf:
            return []
        return self.left.joins() + self.right.joins() + [self]

    def describe(self, indent: int = 0) -> str:
        pad = "  " * indent
        if self.is_leaf:
            return f"{pad}SCAN {self.query.name}\n"
        head = (
            f"{pad}JOIN[{self.algo.value},{self.comm.value}] {self.query.name}\n"
        )
        return head + self.left.describe(indent + 1) + self.right.describe(indent + 1)
