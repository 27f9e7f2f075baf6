"""Unit tests for plan structures and Equation 3 configuration."""
import pytest

from repro.core.plan import (
    CommMode,
    JoinAlgo,
    PlanNode,
    complete_star_root,
    configure,
    is_complete_star_join,
    is_pullable_hash_join,
    orient,
    pull_hash_root,
)
from repro.graphs.queries import QUERIES

Q1 = QUERIES["q1"]


def sub(q, edges):
    return q.subquery(frozenset(tuple(sorted(e)) for e in edges))


def test_complete_star_join_wedge_closure():
    left = sub(Q1, [(0, 1), (1, 2)])  # wedge matched {0,1,2}
    right = sub(Q1, [(0, 3), (2, 3)])  # star at 3, leaves {0,2}
    assert complete_star_root(left, right) == 3
    assert is_complete_star_join(left, right)


def test_complete_star_join_single_edge_orientation():
    """For a single-edge unit either endpoint can root the star; the root
    must be chosen so the leaf is already matched."""
    left = sub(Q1, [(0, 1)])  # matched {0, 1}
    right = sub(Q1, [(1, 2)])
    assert complete_star_root(left, right) == 2  # 2 is the new vertex


def test_complete_star_root_prefers_new_vertex():
    q3 = QUERIES["q3"]
    left = sub(q3, [(0, 1), (0, 2)])  # matched {0,1,2}
    right = sub(q3, [(1, 2)])  # both endpoints matched: closing edge
    r = complete_star_root(left, right)
    assert r in (1, 2)  # verification case: no new vertex available


def test_not_complete_star_join():
    left = sub(Q1, [(0, 1)])
    right = sub(Q1, [(2, 3)])  # disjoint from left
    assert not is_complete_star_join(left, right)


def test_pullable_hash_join():
    q2 = QUERIES["q2"]
    left = sub(q2, [(0, 1)])
    right = sub(q2, [(0, 2), (0, 3)])  # star rooted at matched 0
    assert pull_hash_root(left, right) == 0
    assert is_pullable_hash_join(left, right)


def test_configure_eq3_wco_pull():
    left = sub(Q1, [(0, 1), (1, 2)])
    right = sub(Q1, [(0, 3), (2, 3)])
    assert configure(left, right) == (JoinAlgo.WCO, CommMode.PULL)


def test_configure_eq3_hash_pull():
    q2 = QUERIES["q2"]
    left = sub(q2, [(0, 1)])
    right = sub(q2, [(0, 2), (0, 3)])
    # leaves {2,3} not all matched -> not complete star join; root 0
    # matched -> pulling hash join.
    assert configure(left, right) == (JoinAlgo.HASH, CommMode.PULL)


def test_configure_eq3_hash_push():
    q7 = QUERIES["q7"]
    left = sub(q7, [(0, 1), (1, 2), (2, 3)])
    right = sub(q7, [(3, 4), (4, 5)])  # star at 4: root not matched,
    # leaves {3,5} not all matched -> pushing hash join
    assert configure(left, right) == (JoinAlgo.HASH, CommMode.PUSH)


def test_orient_yields_complete_star_join_when_possible():
    """For the square both orientations are complete star joins (a wedge
    extends the other); orient must return one of them."""
    left = sub(Q1, [(0, 3), (2, 3)])
    right = sub(Q1, [(0, 1), (1, 2)])
    l, r = orient(left, right)
    assert is_complete_star_join(l, r)


def test_orient_swaps_when_only_one_side_is_star():
    q7 = QUERIES["q7"]
    path = sub(q7, [(0, 1), (1, 2), (2, 3)])  # not a star
    star = sub(q7, [(3, 4)])
    l, r = orient(star, path)  # star passed on the left
    assert r.edges == star.edges  # swapped so the star is the right side


def test_plan_node_leaf_requires_star():
    with pytest.raises(ValueError):
        PlanNode.leaf(sub(Q1, [(0, 1), (1, 2), (2, 3)]))  # path, not star


def test_plan_join_auto_configures():
    l = PlanNode.leaf(sub(Q1, [(0, 1), (1, 2)]))
    r = PlanNode.leaf(sub(Q1, [(0, 3), (2, 3)]))
    j = PlanNode.join(Q1.full(), l, r)
    assert j.algo is JoinAlgo.WCO
    assert j.comm is CommMode.PULL


def test_plan_join_explicit_physical():
    l = PlanNode.leaf(sub(Q1, [(0, 1), (1, 2)]))
    r = PlanNode.leaf(sub(Q1, [(0, 3), (2, 3)]))
    j = PlanNode.join(Q1.full(), l, r, JoinAlgo.HASH, CommMode.PUSH)
    assert j.algo is JoinAlgo.HASH and j.comm is CommMode.PUSH


def test_plan_validate_accepts_good_tree():
    l = PlanNode.leaf(sub(Q1, [(0, 1), (1, 2)]))
    r = PlanNode.leaf(sub(Q1, [(0, 3), (2, 3)]))
    PlanNode.join(Q1.full(), l, r)._validate_node()


def test_plan_leaves_and_joins_traversal():
    l = PlanNode.leaf(sub(Q1, [(0, 1), (1, 2)]))
    r = PlanNode.leaf(sub(Q1, [(0, 3), (2, 3)]))
    j = PlanNode.join(Q1.full(), l, r)
    assert len(j.leaves()) == 2
    assert j.joins() == [j]
    assert j.is_left_deep()


def test_describe_mentions_physical_settings():
    l = PlanNode.leaf(sub(Q1, [(0, 1), (1, 2)]))
    r = PlanNode.leaf(sub(Q1, [(0, 3), (2, 3)]))
    text = PlanNode.join(Q1.full(), l, r).describe()
    assert "wco" in text and "pull" in text and "SCAN" in text
