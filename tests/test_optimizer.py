"""Unit tests for Algorithm 1 and the baseline plan generators."""
import pytest

from repro.baselines.plans import baseline_plan, huge_variant, rads_plan
from repro.core.optimizer import (
    EH_CONFIG,
    GF_CONFIG,
    HUGE_CONFIG,
    SEED_CONFIG,
    OptimizerConfig,
    left_deep_plan,
    optimal_plan,
    starjoin_decomposition,
    wco_plan,
    wco_vertex_order,
)
from repro.core.plan import CommMode, JoinAlgo
from repro.graphs.queries import QUERIES
from repro.graphs.storage import GraphStats

STATS = GraphStats(
    10_000, 80_000, 600, 16.0,
    {1: 160_000.0, 2: 9.6e6, 3: 1.6e9, 4: 5.0e11, 5: 2.2e14},
)
K = 10


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_optimal_plan_valid_for_all_queries(name):
    q = QUERIES[name]
    plan = optimal_plan(q, STATS, K, HUGE_CONFIG)
    plan._validate_node()
    assert plan.query.edges == q.edges


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_optimal_plan_units_are_stars(name):
    plan = optimal_plan(QUERIES[name], STATS, K, HUGE_CONFIG)
    assert all(u.is_star() for u in plan.leaves())


def test_q1_plan_is_wedge_wco_join():
    """The square's optimal plan is the paper's Figure-1b shape: two
    wedges joined by a pulling wco join."""
    plan = optimal_plan(QUERIES["q1"], STATS, K, HUGE_CONFIG)
    assert len(plan.leaves()) == 2
    assert all(len(u.edges) == 2 for u in plan.leaves())
    assert plan.algo is JoinAlgo.WCO and plan.comm is CommMode.PULL


def test_q7_plan_is_path_join_path():
    """Exp-9: the 5-path's optimal plan joins a 3-path with a 2-path via
    a pushing hash join."""
    plan = optimal_plan(QUERIES["q7"], STATS, K, HUGE_CONFIG)
    assert plan.algo is JoinAlgo.HASH and plan.comm is CommMode.PUSH
    sizes = sorted(len(n.query.edges) for n in (plan.left, plan.right))
    assert sizes == [2, 3]


def test_huge_q1_all_pull():
    plan = optimal_plan(QUERIES["q1"], STATS, K, HUGE_CONFIG)
    assert all(j.comm is CommMode.PULL for j in plan.joins())


def test_seed_config_forces_hash_push():
    plan = optimal_plan(QUERIES["q1"], STATS, K, SEED_CONFIG)
    for j in plan.joins():
        assert j.algo is JoinAlgo.HASH and j.comm is CommMode.PUSH


def test_left_deep_restriction():
    cfg = OptimizerConfig(left_deep=True)
    for name in ("q1", "q3", "q7"):
        plan = optimal_plan(QUERIES[name], STATS, K, cfg)
        assert plan.is_left_deep()


def test_eh_gf_configs_produce_valid_plans():
    for cfg in (EH_CONFIG, GF_CONFIG):
        for name in ("q7", "q8"):
            plan = optimal_plan(QUERIES[name], STATS, K, cfg)
            plan._validate_node()


def test_optimal_plan_star_query_is_single_scan():
    # A star query is itself a join unit: the plan is a bare SCAN leaf.
    from repro.graphs.queries import WEDGE

    plan = optimal_plan(WEDGE, STATS, K, HUGE_CONFIG)
    assert plan.is_leaf
    assert plan.query.edges == WEDGE.edges


# -- greedy star decomposition (StarJoin) ----------------------------------


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_starjoin_decomposition_covers_and_is_disjoint(name):
    q = QUERIES[name]
    units = starjoin_decomposition(q)
    all_edges = [e for u in units for e in u.edges]
    assert len(all_edges) == len(set(all_edges)) == len(q.edges)
    assert all(u.is_star() for u in units)


def test_starjoin_q2_materialises_three_star():
    """The diamond's greedy decomposition leads with a 3-star — the
    plan defect the paper blames for RADS' q2 blow-up."""
    units = starjoin_decomposition(QUERIES["q2"])
    assert max(len(u.edges) for u in units) == 3


def test_left_deep_plan_builds_valid_tree():
    q = QUERIES["q1"]
    plan = left_deep_plan(q, starjoin_decomposition(q), JoinAlgo.HASH, CommMode.PUSH)
    plan._validate_node()
    assert plan.is_left_deep()
    assert plan.query.edges == q.edges


# -- wco plans (BiGJoin / BENU) --------------------------------------------


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_wco_vertex_order_connected_prefix(name):
    q = QUERIES[name]
    order = wco_vertex_order(q)
    assert sorted(order) == list(range(q.n_vertices))
    for i in range(1, q.n_vertices):
        assert q.adj[order[i]] & set(order[:i])


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_wco_plan_left_deep_complete_star_joins(name):
    q = QUERIES[name]
    plan = wco_plan(q, CommMode.PUSH)
    plan._validate_node()
    assert plan.is_left_deep()
    assert plan.query.edges == q.edges
    for j in plan.joins():
        assert j.algo is JoinAlgo.WCO


# -- RADS ------------------------------------------------------------------


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_rads_plan_roots_stars_at_matched_vertices(name):
    """Every expansion star must be rooted at an already-matched vertex
    (RADS' pulling requirement, Property 3.1 C1)."""
    q = QUERIES[name]
    plan = rads_plan(q)
    plan._validate_node()
    matched: set[int] = set()
    for node in plan.joins():
        right = node.right.query
        roots = right.star_roots()
        if matched:
            assert any(r in matched for r in roots)
        matched |= node.query.vertices
    assert plan.query.edges == q.edges


def test_rads_all_joins_pull_hash():
    plan = rads_plan(QUERIES["q2"])
    for j in plan.joins():
        assert j.algo is JoinAlgo.HASH and j.comm is CommMode.PULL


# -- plugging into HUGE (Exp-1) --------------------------------------------


def test_huge_variant_reconfigures_physical_only():
    base = baseline_plan("SEED", QUERIES["q1"], STATS, K)
    hv = huge_variant(base)
    assert [u.edges for u in hv.leaves()] == [u.edges for u in base.leaves()]
    # SEED's q1 wedge-join becomes a pulling wco join under Equation 3.
    assert hv.comm is CommMode.PULL


@pytest.mark.parametrize(
    "system",
    ["HUGE", "SEED", "BIGJOIN", "BENU", "RADS", "STARJOIN",
     "HUGE-WCO", "HUGE-BENU", "HUGE-SEED", "HUGE-RADS", "HUGE-EH", "HUGE-GF"],
)
def test_baseline_plan_all_systems_q1(system):
    plan = baseline_plan(system, QUERIES["q1"], STATS, K)
    plan._validate_node()
    assert plan.query.edges == QUERIES["q1"].edges


def test_unknown_system_raises():
    with pytest.raises(ValueError):
        baseline_plan("NOPE", QUERIES["q1"], STATS, K)
