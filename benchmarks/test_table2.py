"""Benchmark: Table 2 — plan taxonomy derived from the plan generators."""
from repro.exps.common import write_rows

from repro.exps.table2 import PAPER_ROWS, run_table2


def test_table2(benchmark, results_dir):
    rows = benchmark.pedantic(run_table2, rounds=1, iterations=1)
    write_rows(results_dir, "table2", rows, "Table 2 (derived)")
    derived = {r["work"]: r for r in rows}
    for paper in PAPER_ROWS:
        got = derived[paper["work"]]
        assert got["order"] == paper["order"]
        assert got["unit"] == "star"
    assert derived["HUGE"]["comm"] == "hybrid"
    assert derived["HUGE"]["algo"] == "hash+wco"
