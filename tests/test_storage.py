"""Integration tests for the distributed graph storage model."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.graphs.generators import chung_lu
from repro.graphs.storage import DataGraph, owner, table3_row


@pytest.fixture(scope="module")
def graph(spark):
    pdf = chung_lu(300, 900, seed=3)
    g = DataGraph.from_pandas(spark, pdf, k=7)
    yield g
    g.unpersist()


def test_edges_are_symmetric(graph):
    fwd = graph.edges.count()
    rev = (
        graph.edges.alias("e")
        .join(
            graph.edges.alias("r"),
            (F.col("e.src") == F.col("r.dst")) & (F.col("e.dst") == F.col("r.src")),
            "left_semi",
        )
        .count()
    )
    assert fwd == rev  # every directed edge has its reverse


def test_edge_count_doubles_undirected(graph):
    assert graph.edges.count() == 2 * graph.stats.n_edges


def test_no_self_loops(graph):
    assert graph.edges.filter(F.col("src") == F.col("dst")).count() == 0


def test_degrees_sum_to_directed_edges(graph):
    total = graph.degrees.agg(F.sum("deg")).collect()[0][0]
    assert total == 2 * graph.stats.n_edges


def test_stats_match_degrees(graph):
    m = graph.degrees.agg(F.max("deg")).collect()[0][0]
    assert graph.stats.d_max == m
    assert graph.stats.n_vertices == graph.degrees.count()
    assert graph.stats.d_avg == pytest.approx(
        2 * graph.stats.n_edges / graph.stats.n_vertices
    )


def test_moments_consistent(graph):
    m1 = graph.stats.moments[1]
    assert m1 == pytest.approx(2 * graph.stats.n_edges)
    # Cauchy-Schwarz-ish sanity: M2 >= M1^2 / n
    assert graph.stats.moments[2] >= m1**2 / graph.stats.n_vertices


def test_owner_partitioning_balanced(spark, graph):
    counts = (
        graph.degrees.select(owner("v", graph.k).alias("m"))
        .groupBy("m")
        .count()
        .collect()
    )
    per = {r["m"]: r["count"] for r in counts}
    assert set(per) == set(range(graph.k))
    assert max(per.values()) < 2 * min(per.values())


def test_owner_deterministic(spark):
    df = spark.range(100).select(F.col("id").alias("v"))
    a = df.select(owner("v", 5).alias("m")).collect()
    b = df.select(owner("v", 5).alias("m")).collect()
    assert a == b


def test_from_pandas_rejects_bad_columns(spark):
    with pytest.raises(ValueError):
        DataGraph.from_pandas(spark, pd.DataFrame({"x": [1], "y": [2]}))


def test_table3_row_shape(graph):
    row = table3_row("T", graph)
    assert row["dataset"] == "T"
    assert row["V"] == graph.stats.n_vertices
    assert row["E"] == graph.stats.n_edges
    assert row["d_max"] == graph.stats.d_max
