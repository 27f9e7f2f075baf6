"""Reference SQL for subgraph enumeration, fed to the DuckDB oracle.

Generates, from a :class:`QueryGraph`, the classic edge-self-join SQL
over the directed edge table (both directions of every undirected edge):
one alias per query edge, equality constraints binding shared query
vertices, injectivity predicates, and (optionally) the symmetry-breaking
partial order. Used by ``repro.oracle.assert_equivalent`` to validate
every engine/plan/baseline against an independent implementation.
"""
from __future__ import annotations

from repro.graphs.queries import QueryGraph


def _bindings(q: QueryGraph) -> tuple[list[tuple[int, int]], dict[int, str]]:
    """Pick one orientation per query edge and a canonical SQL expression
    per query vertex (its first appearance among the edge aliases)."""
    edges = sorted(q.edges)
    expr: dict[int, str] = {}
    for i, (a, b) in enumerate(edges):
        expr.setdefault(a, f"e{i}.src")
        expr.setdefault(b, f"e{i}.dst")
    return edges, expr


def match_sql(
    q: QueryGraph,
    table: str = "edges",
    *,
    sym_break: bool = True,
    count_only: bool = True,
) -> str:
    """SQL enumerating matches of ``q`` over directed ``table(src, dst)``.

    With ``count_only`` the projection is ``count(*) AS cnt``; otherwise
    one column ``v<i>`` per query vertex (for full-set comparison on
    tiny graphs).
    """
    edges, expr = _bindings(q)
    froms = ", ".join(f"{table} AS e{i}" for i in range(len(edges)))
    conds: list[str] = []
    for i, (a, b) in enumerate(edges):
        if expr[a] != f"e{i}.src":
            conds.append(f"e{i}.src = {expr[a]}")
        if expr[b] != f"e{i}.dst":
            conds.append(f"e{i}.dst = {expr[b]}")
    verts = sorted(q.vertices)
    for i, x in enumerate(verts):
        for y in verts[i + 1 :]:
            if not q.has_edge(x, y):
                conds.append(f"{expr[x]} <> {expr[y]}")
    if sym_break:
        conds.extend(f"{expr[a]} < {expr[b]}" for a, b in q.symmetry_breaking)
    where = " AND ".join(conds) if conds else "TRUE"
    proj = (
        "count(*) AS cnt"
        if count_only
        else ", ".join(f"{expr[v]} AS v{v}" for v in verts)
    )
    return f"SELECT {proj} FROM {froms} WHERE {where}"
