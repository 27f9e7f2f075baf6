"""Unit tests for query graphs, automorphisms and symmetry breaking."""
import itertools

import pytest

from repro.graphs.queries import (
    EDGE_Q,
    QUERIES,
    TRIANGLE,
    WEDGE,
    QueryGraph,
)

EXPECTED_AUT = {
    "q1": 8,  # square: dihedral D4
    "q2": 4,  # diamond
    "q3": 24,  # K4: S4
    "q4": 2,  # house
    "q5": 120,  # K5: S5
    "q6": 10,  # C5: D5
    "q7": 2,  # path: reversal
    "q8": 12,  # C6: D6
}

EXPECTED_EDGES = {
    "q1": 4, "q2": 5, "q3": 6, "q4": 6, "q5": 10, "q6": 5, "q7": 5, "q8": 6,
}


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_query_connected(name):
    assert QUERIES[name].is_connected()


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_query_edge_count(name):
    assert len(QUERIES[name].edges) == EXPECTED_EDGES[name]


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_automorphism_group_size(name):
    assert len(QUERIES[name].automorphisms) == EXPECTED_AUT[name]


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_automorphisms_form_group(name):
    """Closure under composition and inverse (sanity of the brute force)."""
    q = QUERIES[name]
    auts = set(q.automorphisms)
    ident = tuple(range(q.n_vertices))
    assert ident in auts
    for p in q.automorphisms:
        inv = tuple(sorted(range(q.n_vertices), key=lambda v: p[v]))
        assert inv in auts


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_symmetry_breaking_counts_each_class_once(name):
    """On a complete data graph K_n, matches with the partial order must
    be exactly (all matches) / |Aut| — the defining property."""
    q = QUERIES[name]
    n = q.n_vertices + 2
    total = constrained = 0
    for perm in itertools.permutations(range(n), q.n_vertices):
        # K_n contains every injective mapping.
        total += 1
        if all(perm[a] < perm[b] for a, b in q.symmetry_breaking):
            constrained += 1
    assert total == constrained * len(q.automorphisms)


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_symmetry_breaking_kills_every_nontrivial_automorphism(name):
    """For any non-identity automorphism p there is an injective vertex
    assignment satisfying the partial order whose image under p violates
    it — otherwise two distinct representatives of one class survive."""
    q = QUERIES[name]
    ident = tuple(range(q.n_vertices))
    # The stabiliser chain construction guarantees: an automorphism that
    # fixes every constrained "minimum" vertex is the identity.
    fixed_by_conds = [
        p
        for p in q.automorphisms
        if all(p[a] == a for a, _ in q.symmetry_breaking)
    ]
    assert fixed_by_conds == [ident]


def test_star_detection():
    assert EDGE_Q.is_star()
    assert WEDGE.is_star()
    assert not TRIANGLE.is_star()
    assert not QUERIES["q1"].is_star()


def test_subquery_star_roots_single_edge():
    sub = QUERIES["q1"].subquery(frozenset({(0, 1)}))
    assert sub.star_roots() == (0, 1)
    assert sub.is_star()


def test_subquery_star_roots_wedge():
    sub = QUERIES["q1"].subquery(frozenset({(0, 1), (1, 2)}))
    assert sub.star_roots() == (1,)
    assert sub.star_leaves() == frozenset({0, 2})


def test_subquery_not_star():
    sub = QUERIES["q1"].subquery(frozenset({(0, 1), (2, 3)}))
    assert not sub.is_star()
    assert not sub.is_connected()


def test_subquery_connectivity():
    q = QUERIES["q1"]
    assert q.subquery(frozenset({(0, 1), (1, 2)})).is_connected()
    assert not q.subquery(frozenset({(0, 1), (2, 3)})).is_connected()


def test_from_edges_rejects_self_loop():
    with pytest.raises(ValueError):
        QueryGraph.from_edges([(0, 0), (0, 1)])


def test_from_edges_rejects_disconnected():
    with pytest.raises(ValueError):
        QueryGraph.from_edges([(0, 1), (2, 3)])


def test_from_edges_rejects_sparse_ids():
    with pytest.raises(ValueError):
        QueryGraph.from_edges([(0, 2)])


def test_clique_detection():
    assert QUERIES["q3"].is_clique()
    assert QUERIES["q5"].is_clique()
    assert not QUERIES["q1"].is_clique()


def test_degrees():
    q = QUERIES["q2"]  # diamond: 0-1,1-2,2-3,3-0,0-2
    assert q.degree(0) == 3 and q.degree(2) == 3
    assert q.degree(1) == 2 and q.degree(3) == 2
