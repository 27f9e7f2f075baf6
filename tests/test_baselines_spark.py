"""Integration tests: every baseline system, oracle-checked, plus the
cross-system accounting relations the paper's Table 1 is built on."""
import duckdb
import pandas as pd
import pytest

from repro.baselines.runner import SYSTEMS, bfs_peak_bytes, graph_bytes, run_system
from repro.core.reference import match_sql
from repro.graphs.generators import chung_lu
from repro.graphs.queries import QUERIES
from repro.graphs.storage import DataGraph

SF_TEST = dict(n=220, m=660, seed=23)
ALL_SYSTEMS = sorted(SYSTEMS)


@pytest.fixture(scope="module")
def graph(spark):
    pdf = chung_lu(SF_TEST["n"], SF_TEST["m"], seed=SF_TEST["seed"])
    g = DataGraph.from_pandas(spark, pdf, k=10)
    yield g
    g.unpersist()


@pytest.fixture(scope="module")
def oracle_counts():
    pdf = chung_lu(SF_TEST["n"], SF_TEST["m"], seed=SF_TEST["seed"])
    e = pdf.rename(columns={"a": "src", "b": "dst"})
    both = pd.concat([e, e.rename(columns={"src": "dst", "dst": "src"})])
    out = {}
    con = duckdb.connect()
    try:
        con.register("edges", both[["src", "dst"]])
        for name in ("q1", "q2"):
            out[name] = con.execute(match_sql(QUERIES[name], "edges")).fetchone()[0]
    finally:
        con.close()
    return out


@pytest.fixture(scope="module")
def runs(graph):
    """One q1 run per system (module-scoped: these are Spark-heavy)."""
    return {
        s: run_system(s, QUERIES["q1"], graph, warmups=0) for s in ALL_SYSTEMS
    }


@pytest.mark.parametrize("system", ALL_SYSTEMS)
def test_system_counts_match_oracle_q1(runs, oracle_counts, system):
    assert runs[system].stats.result_count == oracle_counts["q1"]


@pytest.mark.parametrize("system", ["HUGE", "RADS", "BENU", "SEED"])
def test_system_counts_match_oracle_q2(graph, oracle_counts, system):
    run = run_system(system, QUERIES["q2"], graph, warmups=0)
    assert run.stats.result_count == oracle_counts["q2"]


def test_pushing_systems_push_not_pull(runs):
    for s in ("SEED", "BIGJOIN", "STARJOIN"):
        assert runs[s].stats.push_bytes > 0
        assert runs[s].stats.pull_bytes == 0


def test_pulling_systems_pull_not_push(runs):
    for s in ("BENU", "RADS", "HUGE"):
        assert runs[s].stats.pull_bytes > 0
        assert runs[s].stats.push_bytes == 0


def test_huge_communication_below_every_native_system(runs):
    """Table 1's C column: HUGE moves less data than every *native*
    baseline. (HUGE-X variants share HUGE's pulling machinery and can
    tie within rounding at this tiny scale.)"""
    huge = runs["HUGE"].stats.comm_bytes
    for s in ("SEED", "BIGJOIN", "STARJOIN", "BENU", "RADS"):
        assert huge < runs[s].stats.comm_bytes * 1.05


def test_push_volume_exceeds_pull_volume(runs):
    """Remark 3.1: pushing intermediate results costs more than pulling
    graph data. (The paper's ~100x gap needs benchmark scale — at the
    tiny test scale intermediates barely exceed the graph, so only the
    direction is asserted; Table 1's harness shows the factor.)"""
    assert runs["SEED"].stats.comm_bytes > runs["BENU"].stats.comm_bytes
    assert runs["BIGJOIN"].stats.comm_bytes > 2 * runs["HUGE"].stats.comm_bytes


def test_rads_region_groups_inflate_pulls(runs):
    """RADS re-pulls per region group: its pull volume must exceed
    HUGE's globally-cached pulls."""
    assert runs["RADS"].stats.pull_bytes > runs["HUGE"].stats.pull_bytes


def test_benu_kv_model_slows_compute(runs):
    assert runs["BENU"].stats.kv_model
    assert runs["BENU"].stats.t_compute_s > runs["HUGE-BENU"].stats.t_compute_s


def test_huge_variants_same_counts(runs):
    counts = {runs[s].stats.result_count for s in ALL_SYSTEMS}
    assert len(counts) == 1


def test_huge_total_time_wins(runs):
    """Table 1's headline at any scale: HUGE's modelled total time is
    the smallest."""
    huge = runs["HUGE"].stats.t_total_s
    for s in ("SEED", "BIGJOIN", "BENU", "RADS", "STARJOIN"):
        assert huge <= runs[s].stats.t_total_s * 1.2  # 20% wall-noise slack


def test_memory_models_positive(runs):
    for s in ALL_SYSTEMS:
        assert runs[s].stats.peak_mem_bytes > 0


def test_benu_memory_smallest(runs):
    """Table 1's M column: DFS BENU holds the least; BFS pushing
    systems hold the most."""
    benu = runs["BENU"].stats.peak_mem_bytes
    assert benu <= runs["HUGE"].stats.peak_mem_bytes
    assert benu < runs["SEED"].stats.peak_mem_bytes
    assert benu < runs["RADS"].stats.peak_mem_bytes


def test_bfs_peak_at_least_largest_operator(runs):
    r = runs["SEED"]
    largest = max(o.out_bytes for o in r.stats.ops)
    assert bfs_peak_bytes(r.flow, r.stats) >= largest


def test_graph_bytes_sane(graph):
    assert graph_bytes(graph) >= 4 * graph.n_edges * 8


def test_huge_seed_speeds_up_seed(runs):
    """Exp-1 (Remark 3.2): plugging SEED's logical plan into HUGE gives
    a lower modelled total time than native SEED."""
    assert (
        runs["HUGE-SEED"].stats.t_total_s < runs["SEED"].stats.t_total_s
    )


def test_huge_benu_speeds_up_benu(runs):
    assert runs["HUGE-BENU"].stats.t_total_s < runs["BENU"].stats.t_total_s


def test_huge_rads_speeds_up_rads(runs):
    assert runs["HUGE-RADS"].stats.t_total_s < runs["RADS"].stats.t_total_s
