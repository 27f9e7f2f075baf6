"""Distributed graph storage model over one SparkSession.

The paper randomly partitions the data graph over ``k`` machines and
stores each vertex with its adjacency list on one partition (§2 "Graph
Storage"). We simulate that cluster: a vertex ``v``'s *owner machine* is
``v mod k`` (ids are dense, hubs spread across machines), intermediate
results carry a home-machine column, and all communication accounting is
derived from owners (see ``core/accounting.py``).

:class:`DataGraph` bundles the directed-edge DataFrame (both directions
of every undirected edge — the adjacency-list view Catalyst joins use),
the degree table, and the degree moments the cardinality estimator needs.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import Column, DataFrame, SparkSession
from pyspark.sql import functions as F

MACH_COL = "_mach"


def owner(col: Column | str, k: int) -> Column:
    """Owner machine of a vertex id under the paper's random partitioning."""
    return F.pmod(F.col(col) if isinstance(col, str) else col, F.lit(k))


@dataclass(frozen=True)
class GraphStats:
    """Table-3 style statistics of a data graph."""

    n_vertices: int
    n_edges: int  # undirected edge count
    d_max: int
    d_avg: float
    moments: dict[int, float]  # M_p = sum_v deg(v)^p, p = 1..5


@dataclass(frozen=True)
class DataGraph:
    """A partitioned data graph on the simulated ``k``-machine cluster."""

    edges: DataFrame  # directed: (src BIGINT, dst BIGINT), both directions
    degrees: DataFrame  # (v BIGINT, deg BIGINT)
    stats: GraphStats
    k: int
    name: str = "G"

    @staticmethod
    def from_pandas(
        spark: SparkSession,
        undirected: pd.DataFrame,
        *,
        k: int = 10,
        name: str = "G",
        partitions: int | None = None,
    ) -> "DataGraph":
        """Load canonical undirected edges ``(a < b)`` as a DataGraph.

        Both edge directions are materialised and persisted (the CSR
        adjacency view of the paper); degrees and moments are computed
        once up front.
        """
        if not {"a", "b"}.issubset(undirected.columns):
            raise ValueError("expected canonical undirected columns a, b")
        pdf = undirected[["a", "b"]].astype("int64")
        one = spark.createDataFrame(pdf)
        if partitions:
            one = one.repartition(partitions)
        edges = (
            one.select(F.col("a").alias("src"), F.col("b").alias("dst"))
            .unionAll(one.select(F.col("b").alias("src"), F.col("a").alias("dst")))
            .persist()
        )
        degrees = (
            edges.groupBy(F.col("src").alias("v"))
            .agg(F.count("*").alias("deg"))
            .persist()
        )
        mom_exprs = [
            F.sum(F.pow(F.col("deg").cast("double"), float(p))).alias(f"m{p}")
            for p in range(1, 6)
        ]
        row = degrees.agg(
            F.count("*").alias("nv"),
            F.max("deg").alias("dmax"),
            *mom_exprs,
        ).collect()[0]
        n_edges = len(pdf)
        stats = GraphStats(
            n_vertices=int(row["nv"]),
            n_edges=n_edges,
            d_max=int(row["dmax"]),
            d_avg=2.0 * n_edges / max(1, int(row["nv"])),
            moments={p: float(row[f"m{p}"]) for p in range(1, 6)},
        )
        return DataGraph(edges=edges, degrees=degrees, stats=stats, k=k, name=name)

    def unpersist(self) -> None:
        self.edges.unpersist()
        self.degrees.unpersist()

    @property
    def n_vertices(self) -> int:
        return self.stats.n_vertices

    @property
    def n_edges(self) -> int:
        return self.stats.n_edges

    @property
    def d_max(self) -> int:
        return self.stats.d_max


def table3_row(name: str, g: DataGraph) -> dict:
    """One row of the reproduced Table 3."""
    return {
        "dataset": name,
        "V": g.stats.n_vertices,
        "E": g.stats.n_edges,
        "d_max": g.stats.d_max,
        "d_avg": round(g.stats.d_avg, 1),
    }
