"""Integration tests: the HUGE engine on Spark vs the DuckDB oracle.

Every count is validated by ``repro.oracle.assert_equivalent`` running
the generated reference SQL over the same edge table.
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.dataflow import translate
from repro.core.engine import EngineOptions, execute, vcol
from repro.core.optimizer import HUGE_CONFIG, optimal_plan, wco_plan
from repro.core.plan import CommMode
from repro.core.reference import match_sql
from repro.graphs.generators import chung_lu
from repro.graphs.queries import QUERIES
from repro.graphs.storage import MACH_COL, DataGraph
from repro.oracle import assert_equivalent

SF_TEST = dict(n=250, m=750, seed=13)


@pytest.fixture(scope="module")
def graph(spark):
    pdf = chung_lu(SF_TEST["n"], SF_TEST["m"], seed=SF_TEST["seed"])
    g = DataGraph.from_pandas(spark, pdf, k=10)
    yield g
    g.unpersist()


@pytest.fixture(scope="module")
def directed_edges():
    pdf = chung_lu(SF_TEST["n"], SF_TEST["m"], seed=SF_TEST["seed"])
    e = pdf.rename(columns={"a": "src", "b": "dst"})
    return pd.concat(
        [e, e.rename(columns={"src": "dst", "dst": "src"})]
    )[["src", "dst"]]


def run_count_df(spark, g, q, plan):
    res = execute(translate(plan), q, g, EngineOptions())
    res.cleanup()
    return spark.createDataFrame(
        [(res.stats.result_count,)], "cnt bigint"
    ), res


@pytest.mark.parametrize("name", sorted(QUERIES))
def test_huge_plan_matches_oracle(spark, graph, directed_edges, name):
    q = QUERIES[name]
    plan = optimal_plan(q, graph.stats, graph.k, HUGE_CONFIG)
    cnt_df, _ = run_count_df(spark, graph, q, plan)
    assert_equivalent(cnt_df, match_sql(q, "edges"), edges=directed_edges)


@pytest.mark.parametrize("name", ["q1", "q2", "q3"])
def test_wco_push_plan_matches_oracle(spark, graph, directed_edges, name):
    q = QUERIES[name]
    cnt_df, _ = run_count_df(spark, graph, q, wco_plan(q, CommMode.PUSH))
    assert_equivalent(cnt_df, match_sql(q, "edges"), edges=directed_edges)


@pytest.mark.parametrize("name", ["q1", "q2"])
def test_full_match_set_equals_oracle(spark, graph, directed_edges, name):
    """Beyond counts: the exact match rows coincide with DuckDB's."""
    q = QUERIES[name]
    plan = optimal_plan(q, graph.stats, graph.k, HUGE_CONFIG)
    res = execute(translate(plan), q, graph, EngineOptions(keep_result=True))
    cols = [vcol(v) for v in sorted(q.vertices)]
    out = res.result.select(*cols)
    assert_equivalent(
        out, match_sql(q, "edges", count_only=False), edges=directed_edges
    )
    res.cleanup()
    out.unpersist()


def test_symmetry_breaking_times_aut_equals_all(spark, graph):
    """Engine-side |Aut| identity for the square: counting with the
    partial order times |Aut| equals the unbroken count (computed by
    counting each undirected automorphism image via the oracle)."""
    import duckdb

    q = QUERIES["q1"]
    plan = optimal_plan(q, graph.stats, graph.k, HUGE_CONFIG)
    res = execute(translate(plan), q, graph, EngineOptions())
    res.cleanup()
    pdf = chung_lu(SF_TEST["n"], SF_TEST["m"], seed=SF_TEST["seed"])
    e = pdf.rename(columns={"a": "src", "b": "dst"})
    both = pd.concat([e, e.rename(columns={"src": "dst", "dst": "src"})])
    con = duckdb.connect()
    try:
        con.register("edges", both[["src", "dst"]])
        unbroken = con.execute(match_sql(q, "edges", sym_break=False)).fetchone()[0]
    finally:
        con.close()
    assert res.stats.result_count * len(q.automorphisms) == unbroken


def test_mach_column_tracks_owners(spark, graph):
    """Every row's home machine is a valid machine id."""
    q = QUERIES["q1"]
    plan = optimal_plan(q, graph.stats, graph.k, HUGE_CONFIG)
    res = execute(translate(plan), q, graph, EngineOptions(keep_result=True))
    machs = res.result.select(MACH_COL).distinct().collect()
    assert all(0 <= r[0] < graph.k for r in machs)
    res.cleanup()
    res.result.unpersist()


def test_scan_chain_star_construction_is_local(spark, graph):
    """The §5.2 SCAN rewrite keeps star construction owner-local: the
    wedge-building extends report zero pulls."""
    q = QUERIES["q1"]
    plan = optimal_plan(q, graph.stats, graph.k, HUGE_CONFIG)
    res = execute(translate(plan), q, graph, EngineOptions())
    res.cleanup()
    wedge_ops = [o for o in res.stats.ops if o.name.startswith("extend") and o.out_arity == 3]
    assert wedge_ops and all(o.pull_requests == 0 for o in wedge_ops)


def test_final_extend_pulls_remote_only(spark, graph):
    q = QUERIES["q1"]
    plan = optimal_plan(q, graph.stats, graph.k, HUGE_CONFIG)
    res = execute(translate(plan), q, graph, EngineOptions())
    res.cleanup()
    last = res.stats.ops[-1]
    assert last.pull_requests > 0
    # distinct (machine, vertex) pulls cannot exceed k * n
    assert last.pull_requests <= graph.k * graph.n_vertices


def test_per_op_stats_populated(spark, graph):
    q = QUERIES["q2"]
    plan = optimal_plan(q, graph.stats, graph.k, HUGE_CONFIG)
    res = execute(translate(plan), q, graph, EngineOptions())
    res.cleanup()
    assert len(res.stats.ops) == len(res.dataflow.ops())
    for o in res.stats.ops:
        assert o.wall_s >= 0 and o.out_rows >= 0 and o.out_arity >= 2


def test_trace_collection_cap(spark, graph):
    q = QUERIES["q1"]
    plan = optimal_plan(q, graph.stats, graph.k, HUGE_CONFIG)
    res = execute(translate(plan), q, graph, EngineOptions(trace_limit=500))
    res.cleanup()
    assert 0 < len(res.traces) <= 500 * len(res.stats.ops)
    for mach, vid, deg in res.traces[:50]:
        assert 0 <= mach < graph.k
        assert 0 <= vid < graph.n_vertices
        assert deg >= 0
