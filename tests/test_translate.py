"""Unit tests for Algorithm 2: plan -> dataflow translation."""
import pytest

from repro.baselines.plans import rads_plan
from repro.core.dataflow import translate
from repro.core.optimizer import HUGE_CONFIG, SEED_CONFIG, optimal_plan, wco_plan
from repro.core.plan import CommMode, JoinAlgo, PlanNode
from repro.graphs.queries import QUERIES, TRIANGLE
from repro.graphs.storage import GraphStats

STATS = GraphStats(
    10_000, 80_000, 600, 16.0,
    {1: 160_000.0, 2: 9.6e6, 3: 1.6e9, 4: 5.0e11, 5: 2.2e14},
)


def kinds(flow):
    return [op.kind for op in flow.ops()]


def test_scan_star_rewrite_chain():
    """§5.2: a 3-star scan becomes edge scan + 2 extends rooted at v."""
    q2 = QUERIES["q2"]
    star = q2.subquery(frozenset({(0, 1), (0, 2), (0, 3)}))
    flow = translate(PlanNode.leaf(star))
    assert kinds(flow) == ["scan_edge", "extend", "extend"]
    for op in flow.ops()[1:]:
        assert op.ext == (0,)  # all extends rooted at the star root


def test_wco_join_becomes_extend():
    plan = optimal_plan(QUERIES["q1"], STATS, 10, HUGE_CONFIG)
    flow = translate(plan)
    ks = kinds(flow)
    assert "join" not in ks
    assert ks[0] == "scan_edge"
    assert ks.count("extend") >= 2


def test_triangle_closing_edge_becomes_verify():
    """A wco join whose star is fully matched closes an edge: verify."""
    wedge = TRIANGLE.subquery(frozenset({(0, 1), (0, 2)}))
    closing = TRIANGLE.subquery(frozenset({(1, 2)}))
    plan = PlanNode.join(
        TRIANGLE.full(), PlanNode.leaf(wedge), PlanNode.leaf(closing),
        JoinAlgo.WCO, CommMode.PULL,
    )
    flow = translate(plan)
    assert kinds(flow)[-1] == "verify"


def test_push_hash_join_kept_as_join():
    plan = optimal_plan(QUERIES["q7"], STATS, 10, HUGE_CONFIG)
    flow = translate(plan)
    assert kinds(flow)[-1] == "join"
    assert flow.comm is CommMode.PUSH


def test_seed_plan_translates_to_push_joins():
    plan = optimal_plan(QUERIES["q3"], STATS, 10, SEED_CONFIG)
    flow = translate(plan)
    joins = [op for op in flow.ops() if op.kind == "join"]
    assert joins and all(j.comm is CommMode.PUSH for j in joins)


def test_rads_native_translation_keeps_pull_joins():
    plan = rads_plan(QUERIES["q2"])
    flow = translate(plan, native_pull_join=True)
    joins = [op for op in flow.ops() if op.kind == "join"]
    assert joins and all(j.comm is CommMode.PULL for j in joins)
    assert all(j.region_root is not None for j in joins)


def test_rads_huge_mode_rewrites_pull_joins_to_extends():
    """§5.2: pulling hash joins become PULL-EXTEND chains for bounded
    memory when run inside HUGE."""
    plan = rads_plan(QUERIES["q2"])
    flow = translate(plan, native_pull_join=False)
    assert "join" not in kinds(flow)


def test_pull_hash_rewrite_emits_verify_for_matched_leaves():
    """RADS' q2 plan ends with verification edges between matched
    vertices; in HUGE mode these become verify ops."""
    plan = rads_plan(QUERIES["q2"])
    flow = translate(plan, native_pull_join=False)
    assert "verify" in kinds(flow)


def test_wco_plan_translation_extend_count():
    q = QUERIES["q3"]
    flow = translate(wco_plan(q, CommMode.PUSH))
    # K4: first edge + 2 extensions, each closing edges via its ext dims
    extends = [op for op in flow.ops() if op.kind == "extend"]
    assert len(extends) == 2
    assert all(op.comm is CommMode.PUSH for op in extends)
    # the last extension intersects all three matched vertices
    assert len(extends[-1].ext) == 3


def test_ops_bottom_up_order():
    plan = optimal_plan(QUERIES["q7"], STATS, 10, HUGE_CONFIG)
    flow = translate(plan)
    ops = flow.ops()
    assert ops[-1] is flow
    seen = set()
    for op in ops:
        for c in op.children:
            assert id(c) in seen
        seen.add(id(op))


def test_describe_renders():
    plan = optimal_plan(QUERIES["q1"], STATS, 10, HUGE_CONFIG)
    text = translate(plan).describe()
    assert "EXTEND" in text and "SCAN_EDGE" in text
