"""Shared harness plumbing: dataset preparation and row formatting."""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.graphs.generators import dataset
from repro.graphs.storage import DataGraph

DEFAULT_K = 10  # the paper's local cluster size


def build_graph(
    spark: SparkSession,
    name: str,
    *,
    scale: float = 1.0,
    k: int = DEFAULT_K,
    seed: int = 7,
) -> DataGraph:
    """Generate the named synthetic twin and load it as a DataGraph."""
    pdf = dataset(name, scale=scale, seed=seed)
    return DataGraph.from_pandas(spark, pdf, k=k, name=name)


def write_rows(results_dir, name: str, rows: list[dict], title: str) -> None:
    """Persist one reproduced table as markdown under ``results_dir``."""
    import pathlib

    path = pathlib.Path(results_dir) / f"{name}.md"
    path.write_text(format_table(rows, title))


def format_table(rows: list[dict], title: str) -> str:
    """Render harness rows as a GitHub-flavoured markdown table."""
    if not rows:
        return f"### {title}\n(no rows)\n"
    cols = list(rows[0].keys())
    out = [f"### {title}", "| " + " | ".join(cols) + " |",
           "|" + "|".join("---" for _ in cols) + "|"]
    for r in rows:
        out.append("| " + " | ".join(str(r.get(c, "")) for c in cols) + " |")
    return "\n".join(out) + "\n"
