"""Table 3: dataset statistics — |V|, |E|, d_max, d_avg per graph.

The paper lists 7 real graphs; we report the same statistics for their
synthetic scaled-down twins next to the paper's originals (DESIGN.md
documents the substitution). Shape targets: ordering by size, the road
graph EU near-regular (tiny d_max), web graphs (UK, CW) with extreme
d_max relative to |V|, social graphs heavy-tailed.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.exps.common import build_graph
from repro.graphs.generators import DATASETS
from repro.graphs.storage import table3_row


def run_table3(spark: SparkSession, *, scale: float = 1.0, k: int = 10) -> list[dict]:
    rows = []
    for name, spec in DATASETS.items():
        g = build_graph(spark, name, scale=scale, k=k)
        row = table3_row(name, g)
        pv, pe, pdm, pda = spec.paper
        row.update(
            {"paper_V": pv, "paper_E": pe, "paper_d_max": pdm, "paper_d_avg": pda}
        )
        rows.append(row)
        g.unpersist()
    return rows
