"""Query graphs (Figure 4 of the paper) and symmetry breaking.

A :class:`QueryGraph` is a small undirected, connected, unlabelled graph
whose vertices are ``0..n-1``. It provides the structural predicates the
optimiser needs (star / clique / connectivity of edge subsets) plus the
automorphism group and the Grochow–Kellis symmetry-breaking partial order
used by every execution engine in this repo.

The paper's Figure 4 is an image; the q1..q8 reconstruction from the
paper's prose is documented in DESIGN.md §5.
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass, field
from functools import cached_property

Edge = tuple[int, int]


def _norm_edge(a: int, b: int) -> Edge:
    """Canonical undirected edge: sorted pair, no self loops allowed."""
    if a == b:
        raise ValueError(f"self loop {a}")
    return (a, b) if a < b else (b, a)


@dataclass(frozen=True)
class QueryGraph:
    """An undirected connected query graph on vertices ``0..n_vertices-1``."""

    n_vertices: int
    edges: frozenset[Edge]
    name: str = "q"

    @staticmethod
    def from_edges(edge_list, name: str = "q") -> "QueryGraph":
        """Build from an iterable of (a, b) pairs; vertex ids must be dense."""
        edges = frozenset(_norm_edge(a, b) for a, b in edge_list)
        verts = {v for e in edges for v in e}
        n = max(verts) + 1
        if verts != set(range(n)):
            raise ValueError(f"vertex ids not dense 0..{n-1}: {sorted(verts)}")
        q = QueryGraph(n, edges, name)
        if not q.is_connected():
            raise ValueError("query graph must be connected")
        return q

    # -- basic structure ---------------------------------------------------
    @cached_property
    def adj(self) -> dict[int, frozenset[int]]:
        """Adjacency map vertex -> neighbour set."""
        m: dict[int, set[int]] = {v: set() for v in range(self.n_vertices)}
        for a, b in self.edges:
            m[a].add(b)
            m[b].add(a)
        return {v: frozenset(s) for v, s in m.items()}

    def degree(self, v: int) -> int:
        return len(self.adj[v])

    def has_edge(self, a: int, b: int) -> bool:
        return _norm_edge(a, b) in self.edges

    @property
    def vertices(self) -> frozenset[int]:
        return frozenset(range(self.n_vertices))

    def is_connected(self) -> bool:
        return _connected(self.vertices, self.edges)

    def is_clique(self) -> bool:
        n = self.n_vertices
        return len(self.edges) == n * (n - 1) // 2

    def star_root(self) -> int | None:
        """If this graph is a star (tree of depth 1), return its root.

        A single edge is a 1-star; either endpoint works, we return the
        smaller id. Returns None if not a star.
        """
        n, m = self.n_vertices, len(self.edges)
        if m != n - 1:  # a star is a tree
            return None
        if n == 2:
            return 0
        centers = [v for v in range(n) if self.degree(v) == m]
        return centers[0] if centers else None

    def is_star(self) -> bool:
        return self.star_root() is not None

    # -- automorphisms and symmetry breaking --------------------------------
    @cached_property
    def automorphisms(self) -> list[tuple[int, ...]]:
        """All automorphisms as permutations p with p[v] = image of v.

        Brute force over degree-compatible permutations; fine for the
        ≤ 6-vertex queries used in subgraph enumeration papers.
        """
        n = self.n_vertices
        degs = [self.degree(v) for v in range(n)]
        out = []
        for p in itertools.permutations(range(n)):
            if any(degs[v] != degs[p[v]] for v in range(n)):
                continue
            if all(_norm_edge(p[a], p[b]) in self.edges for a, b in self.edges):
                out.append(p)
        return out

    @cached_property
    def symmetry_breaking(self) -> list[tuple[int, int]]:
        """Partial-order constraints (a, b) meaning ``f(a) < f(b)``.

        Grochow–Kellis style: repeatedly pick a vertex in a non-trivial
        orbit, constrain it to be the minimum of its orbit, and restrict
        to its stabiliser, until the group is trivial. Guarantees each
        automorphism class of matches is counted exactly once
        (count_all = count_constrained * |Aut|), verified in tests.
        """
        conds: list[tuple[int, int]] = []
        auts = self.automorphisms
        while len(auts) > 1:
            orbits: dict[int, set[int]] = {}
            for v in range(self.n_vertices):
                orbits[v] = {p[v] for p in auts}
            v = min(
                (v for v in orbits if len(orbits[v]) > 1),
                key=lambda v: (-len(orbits[v]), v),
            )
            conds.extend((v, u) for u in sorted(orbits[v]) if u != v)
            auts = [p for p in auts if p[v] == v]
        return conds

    # -- edge-subset sub-queries (optimiser search space) --------------------
    def subquery(self, edge_subset: frozenset[Edge], name: str | None = None) -> "SubQuery":
        return SubQuery(self, frozenset(edge_subset), name)

    def full(self) -> "SubQuery":
        return self.subquery(self.edges, self.name)


def _connected(verts: frozenset[int], edges: frozenset[Edge]) -> bool:
    if not verts:
        return False
    adj: dict[int, set[int]] = {v: set() for v in verts}
    for a, b in edges:
        adj[a].add(b)
        adj[b].add(a)
    seen = {next(iter(verts))}
    stack = list(seen)
    while stack:
        for u in adj[stack.pop()]:
            if u not in seen:
                seen.add(u)
                stack.append(u)
    return seen == verts


@dataclass(frozen=True)
class SubQuery:
    """A connected edge-subset of a query graph (node of the join DP).

    Identified by its edge set; exposes star/vertex structure relative to
    the parent query's vertex ids.
    """

    parent: QueryGraph
    edges: frozenset[Edge]
    _name: str | None = field(default=None, compare=False)

    @cached_property
    def vertices(self) -> frozenset[int]:
        return frozenset(v for e in self.edges for v in e)

    @property
    def name(self) -> str:
        if self._name:
            return self._name
        return "{" + ",".join(f"{a}-{b}" for a, b in sorted(self.edges)) + "}"

    def is_connected(self) -> bool:
        return _connected(self.vertices, self.edges)

    def degree(self, v: int) -> int:
        return sum(1 for e in self.edges if v in e)

    def star_roots(self) -> tuple[int, ...]:
        """All valid roots if this edge set forms a star (all edges share a
        vertex). A single edge is a 1-star rooted at either endpoint."""
        if not self.edges:
            return ()
        common = set.intersection(*[set(e) for e in self.edges])
        return tuple(sorted(common))

    def star_root(self) -> int | None:
        """Canonical (smallest) root if this edge set forms a star."""
        roots = self.star_roots()
        return roots[0] if roots else None

    def is_star(self) -> bool:
        return self.star_root() is not None

    def star_leaves(self) -> frozenset[int]:
        root = self.star_root()
        if root is None:
            raise ValueError(f"{self.name} is not a star")
        return frozenset(self.vertices - {root})

    def __str__(self) -> str:  # pragma: no cover - debug aid
        return self.name


# ---------------------------------------------------------------------------
# Figure 4 query set (reconstruction documented in DESIGN.md §5)
# ---------------------------------------------------------------------------

Q1_SQUARE = QueryGraph.from_edges([(0, 1), (1, 2), (2, 3), (3, 0)], "q1-square")
Q2_DIAMOND = QueryGraph.from_edges([(0, 1), (1, 2), (2, 3), (3, 0), (0, 2)], "q2-diamond")
Q3_4CLIQUE = QueryGraph.from_edges(
    [(0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3)], "q3-4clique"
)
Q4_HOUSE = QueryGraph.from_edges(
    [(0, 1), (1, 2), (2, 3), (3, 4), (4, 0), (1, 4)], "q4-house"
)
Q5_5CLIQUE = QueryGraph.from_edges(
    [(a, b) for a in range(5) for b in range(a + 1, 5)], "q5-5clique"
)
Q6_5CYCLE = QueryGraph.from_edges([(0, 1), (1, 2), (2, 3), (3, 4), (4, 0)], "q6-5cycle")
Q7_5PATH = QueryGraph.from_edges(
    [(0, 1), (1, 2), (2, 3), (3, 4), (4, 5)], "q7-5path"
)
Q8_6CYCLE = QueryGraph.from_edges(
    [(0, 1), (1, 2), (2, 3), (3, 4), (4, 5), (5, 0)], "q8-6cycle"
)

QUERIES: dict[str, QueryGraph] = {
    "q1": Q1_SQUARE,
    "q2": Q2_DIAMOND,
    "q3": Q3_4CLIQUE,
    "q4": Q4_HOUSE,
    "q5": Q5_5CLIQUE,
    "q6": Q6_5CYCLE,
    "q7": Q7_5PATH,
    "q8": Q8_6CYCLE,
}

TRIANGLE = QueryGraph.from_edges([(0, 1), (1, 2), (0, 2)], "triangle")
WEDGE = QueryGraph.from_edges([(0, 1), (0, 2)], "wedge")
EDGE_Q = QueryGraph.from_edges([(0, 1)], "edge")
