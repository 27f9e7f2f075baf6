"""The HUGE compute engine on Spark: executes a dataflow over DataFrames.

A partial match of query vertices ``{a, b, ...}`` is a row with BIGINT
columns ``va, vb, ...`` plus ``_mach``, the simulated machine currently
holding it (§4.1's shared-nothing cluster). Every operator is a
DataFrame -> DataFrame transformation built from Catalyst joins:

- Equation 2's multiway intersection = one extension join on the first
  extend dimension plus a left-semi verification join per further
  dimension;
- PUSH-JOIN = an equi-join on the shared query-vertex columns.

Isomorphism (injectivity) and symmetry-breaking filters are applied as
early as their columns exist. Communication is *accounted* from the
data (see ``accounting.py``): pull extends count distinct
(machine, remote vertex) adjacency pulls via a Spark aggregation; push
operators count tuples shipped off-machine.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.core.accounting import BYTES_PER_VID, OpStats, RunStats
from repro.core.dataflow import OpNode
from repro.core.plan import CommMode
from repro.graphs.queries import QueryGraph
from repro.graphs.storage import MACH_COL, DataGraph, owner


def vcol(v: int) -> str:
    """Column name of query vertex ``v`` in a match DataFrame."""
    return f"v{v}"


@dataclass(frozen=True)
class EngineOptions:
    """Execution knobs for one run (defaults = HUGE)."""

    kv_model: bool = False  # BENU: charge per-access k/v overhead
    region_groups: int = 1  # RADS: pulls deduplicated only within a region
    keep_result: bool = False  # return the match DataFrame from execute()
    trace_limit: int = 0  # collect up to N remote accesses per pull op
    # (machine, vertex, degree) rows, for the Table-5 cache replay


@dataclass
class _Flow:
    df: DataFrame
    verts: frozenset[int]
    applied: frozenset[tuple[int, int]]  # symmetry conds already filtered
    rows: int


@dataclass
class ExecResult:
    stats: RunStats
    dataflow: OpNode
    result: DataFrame | None = None
    traces: list[tuple[int, int, int]] = field(default_factory=list)
    _persisted: list[DataFrame] = field(default_factory=list)

    def cleanup(self) -> None:
        for df in self._persisted:
            df.unpersist()


def execute(
    root: OpNode,
    q: QueryGraph,
    g: DataGraph,
    opts: EngineOptions = EngineOptions(),
) -> ExecResult:
    """Run the dataflow and gather per-operator statistics."""
    stats = RunStats(k=g.k, kv_model=opts.kv_model)
    persisted: list[DataFrame] = []
    traces: list[tuple[int, int, int]] = []
    conds = q.symmetry_breaking

    def edges_alias(tag: str) -> DataFrame:
        return g.edges.select(
            F.col("src").alias(f"_s{tag}"), F.col("dst").alias(f"_d{tag}")
        )

    def finish(node: OpNode, df: DataFrame, verts, applied) -> _Flow:
        df = df.persist()
        t0 = time.perf_counter()
        rows = df.count()
        wall = time.perf_counter() - t0
        persisted.append(df)
        op = OpStats(
            name=f"{node.kind}:{node.sub.name}",
            out_rows=rows,
            out_arity=len(verts),
            wall_s=wall,
        )
        stats.add(op)
        return _Flow(df, frozenset(verts), frozenset(applied), rows), op

    def constraints(
        df: DataFrame, node_sub, new_v: int, present, applied
    ) -> tuple[DataFrame, set]:
        """Injectivity for the new vertex + newly available symmetry conds."""
        for u in present:
            if tuple(sorted((u, new_v))) not in node_sub.edges:
                df = df.filter(F.col(vcol(u)) != F.col(vcol(new_v)))
        applied = set(applied)
        now = present | {new_v}
        for a, b in conds:
            if (a, b) not in applied and a in now and b in now and new_v in (a, b):
                df = df.filter(F.col(vcol(a)) < F.col(vcol(b)))
                applied.add((a, b))
        return df, applied

    def account_pulls(
        op: OpStats, src: DataFrame, dims: list[int], region: Column | None
    ) -> None:
        """Pull-mode communication: distinct (machine[, region], remote
        vertex) adjacency pulls, weighted by the pulled list's size."""
        parts = []
        for d in dims:
            sel = [F.col(MACH_COL), F.col(vcol(d)).alias("_pv")]
            if region is not None:
                sel.append(region.alias("_rg"))
            parts.append(src.select(*sel).where(owner(vcol(d), g.k) != F.col(MACH_COL)))
        if not parts:
            return
        acc = parts[0]
        for p in parts[1:]:
            acc = acc.unionAll(p)
        if opts.trace_limit:
            rows = (
                acc.join(g.degrees, acc["_pv"] == g.degrees["v"], "left")
                .select(MACH_COL, "_pv", F.coalesce("deg", F.lit(0)).alias("_dg"))
                .limit(opts.trace_limit)
                .collect()
            )
            traces.extend((int(r[0]), int(r[1]), int(r[2])) for r in rows)
        pulls = acc.distinct()
        row = (
            pulls.join(g.degrees, pulls["_pv"] == g.degrees["v"], "left")
            .agg(
                F.count("*").alias("n"),
                F.sum(F.coalesce(F.col("deg"), F.lit(0)) + 1).alias("units"),
            )
            .collect()[0]
        )
        op.pull_requests += int(row["n"] or 0)
        op.pull_bytes += float(row["units"] or 0) * BYTES_PER_VID

    def run(node: OpNode) -> _Flow:
        if node.kind == "scan_edge":
            (a, b) = next(iter(node.sub.edges))
            r = node.target if node.target is not None else node.sub.star_root()
            o = b if r == a else a
            df = g.edges.select(
                F.col("src").alias(vcol(r)),
                F.col("dst").alias(vcol(o)),
                owner("src", g.k).alias(MACH_COL),
            )
            applied: set = set()
            for x, y in conds:
                if {x, y} <= {a, b}:
                    df = df.filter(F.col(vcol(x)) < F.col(vcol(y)))
                    applied.add((x, y))
            flow, op = finish(node, df, {a, b}, applied)
            op.accesses = g.n_vertices  # one local adjacency scan per vertex
            return flow

        if node.kind in ("extend", "verify"):
            child = run(node.children[0])
            dims = list(node.ext)
            w = node.target
            df = child.df
            if node.kind == "extend":
                e0 = edges_alias("x")
                df = (
                    df.join(e0, F.col(vcol(dims[0])) == F.col("_sx"))
                    .drop("_sx")
                    .withColumnRenamed("_dx", vcol(w))
                )
                for i, d in enumerate(dims[1:]):
                    ei = edges_alias(f"c{i}")
                    df = df.join(
                        ei,
                        (F.col(vcol(d)) == F.col(f"_sc{i}"))
                        & (F.col(vcol(w)) == F.col(f"_dc{i}")),
                        "left_semi",
                    )
                df, applied = constraints(df, node.sub, w, child.verts, child.applied)
                verts = child.verts | {w}
            else:  # verify: w already matched; check (d, w) edges via d's lists
                for i, d in enumerate(dims):
                    ei = edges_alias(f"f{i}")
                    df = df.join(
                        ei,
                        (F.col(vcol(d)) == F.col(f"_sf{i}"))
                        & (F.col(vcol(w)) == F.col(f"_df{i}")),
                        "left_semi",
                    )
                applied, verts = child.applied, child.verts
            if node.comm is CommMode.PUSH:
                # BiGJoin: the prefix is shipped to each leaf's owner in turn.
                df = df.withColumn(MACH_COL, owner(vcol(dims[-1]), g.k))
            flow, op = finish(node, df, verts, applied)
            op.accesses = child.rows * len(dims)
            if node.comm is CommMode.PUSH:
                op.push_bytes = (
                    child.rows
                    * len(child.verts)
                    * len(dims)
                    * BYTES_PER_VID
                    * (g.k - 1)
                    / g.k
                )
            else:
                account_pulls(op, child.df, dims, None)
            return flow

        if node.kind == "join":
            lf = run(node.children[0])
            rf = run(node.children[1])
            shared = sorted(lf.verts & rf.verts)
            if not shared:
                raise ValueError(f"cartesian join at {node.sub.name}")
            rdf = rf.df.drop(MACH_COL)
            for s in shared:
                rdf = rdf.withColumnRenamed(vcol(s), f"_r{s}")
            pred = [F.col(vcol(s)) == F.col(f"_r{s}") for s in shared]
            df = lf.df.join(rdf, pred, "inner").drop(*[f"_r{s}" for s in shared])
            # Cross-side injectivity + newly complete symmetry conds.
            applied = set(lf.applied | rf.applied)
            for x in sorted(lf.verts - rf.verts):
                for y in sorted(rf.verts - lf.verts):
                    if tuple(sorted((x, y))) not in node.sub.edges:
                        df = df.filter(F.col(vcol(x)) != F.col(vcol(y)))
            verts = lf.verts | rf.verts
            for a, b in conds:
                if (a, b) not in applied and a in verts and b in verts:
                    df = df.filter(F.col(vcol(a)) < F.col(vcol(b)))
                    applied.add((a, b))
            df = df.withColumn(MACH_COL, owner(vcol(shared[0]), g.k))
            flow, op = finish(node, df, verts, applied)
            op.sort_tuples = lf.rows + rf.rows  # buffered join spill/sort (§4.3)
            op.buffer_bytes = (
                lf.rows * len(lf.verts) + rf.rows * len(rf.verts)
            ) * BYTES_PER_VID
            if node.comm is CommMode.PUSH:
                op.barrier = True  # hash shuffle is barrier-synchronised
                op.push_bytes = (
                    (lf.rows * len(lf.verts) + rf.rows * len(rf.verts))
                    * BYTES_PER_VID
                    * (g.k - 1)
                    / g.k
                )
            else:  # RADS pulling hash join: pull star-root adjacency per region
                pivot = min(lf.verts)
                region = (
                    F.pmod(F.col(vcol(pivot)), F.lit(opts.region_groups))
                    if opts.region_groups > 1
                    else None
                )
                account_pulls(op, lf.df, [node.region_root], region)
                op.accesses = lf.rows
            return flow

        raise ValueError(f"unknown operator kind {node.kind}")

    top = run(root)
    missing = [c for c in conds if c not in top.applied]
    if missing:
        raise AssertionError(f"unapplied symmetry conditions {missing}")
    if top.verts != q.vertices:
        raise AssertionError("dataflow did not cover all query vertices")
    stats.result_count = top.rows
    res = ExecResult(stats, root, top.df if opts.keep_result else None, traces)
    res._persisted = persisted if not opts.keep_result else persisted[:-1]
    return res
