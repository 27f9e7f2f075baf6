"""Unit tests for the degree-moment cardinality estimator."""
import pytest

from repro.core.cardinality import estimate
from repro.graphs.queries import QUERIES
from repro.graphs.storage import GraphStats


def regular_stats(n: int, d: int) -> GraphStats:
    """Exact moments of a d-regular graph on n vertices."""
    return GraphStats(
        n, n * d // 2, d, float(d), {p: n * float(d) ** p for p in range(1, 6)}
    )


def sub(qname, edges):
    q = QUERIES[qname]
    return q.subquery(frozenset(tuple(sorted(e)) for e in edges))


def test_single_edge_estimate_is_directed_edge_count():
    s = regular_stats(1000, 10)
    est = estimate(sub("q1", [(0, 1)]), s)
    assert est == pytest.approx(2 * s.n_edges, rel=0.01)


def test_wedge_estimate_regular():
    """Wedges (ordered) in a d-regular graph ~ n * d^2."""
    s = regular_stats(1000, 10)
    est = estimate(sub("q1", [(0, 1), (1, 2)]), s)
    assert est == pytest.approx(1000 * 100, rel=0.05)


def test_star3_estimate_regular():
    s = regular_stats(1000, 10)
    est = estimate(sub("q2", [(0, 1), (0, 2), (0, 3)]), s)
    assert est == pytest.approx(1000 * 1000, rel=0.05)


def test_square_estimate_regular():
    """C4 homomorphisms in a sparse random d-regular graph ~ d^4."""
    s = regular_stats(1000, 10)
    est = estimate(QUERIES["q1"].full(), s)
    assert est == pytest.approx(10.0**4, rel=0.1)


def test_skew_inflates_cyclic_counts():
    """Same |V|,|E| but skewed degrees -> more wedges and squares."""
    reg = regular_stats(1000, 10)
    skew = GraphStats(
        1000, 5000, 200, 10.0,
        {1: 10_000.0, 2: 400_000.0, 3: 4e7, 4: 8e9, 5: 2e12},
    )
    assert estimate(QUERIES["q1"].full(), skew) > 3 * estimate(
        QUERIES["q1"].full(), reg
    )


def test_larger_subquery_estimates_at_least_one():
    s = regular_stats(100, 2)
    assert estimate(QUERIES["q5"].full(), s) >= 1.0


def test_moment_extrapolation_beyond_five():
    """q5's root degrees only need M_4, but a 6-star would need M_6."""
    from repro.graphs.queries import QueryGraph

    star6 = QueryGraph.from_edges([(0, i) for i in range(1, 7)], "star6")
    s = regular_stats(1000, 10)
    est = estimate(star6.full(), s)
    assert est == pytest.approx(1000 * 10.0**6, rel=0.2)


def test_estimate_monotone_in_edges_for_paths():
    """Adding an edge to a path multiplies by ~d >= 1: longer paths have
    more matches on a d>1-regular graph."""
    s = regular_stats(1000, 10)
    p2 = estimate(sub("q7", [(0, 1), (1, 2)]), s)
    p3 = estimate(sub("q7", [(0, 1), (1, 2), (2, 3)]), s)
    assert p3 > p2
