"""Benchmark: Table 3 — dataset statistics of the 7 synthetic twins."""
from repro.exps.common import write_rows

from repro.exps.table3 import run_table3


def test_table3(benchmark, spark, results_dir):
    rows = benchmark.pedantic(
        lambda: run_table3(spark, scale=1.0), rounds=1, iterations=1
    )
    write_rows(results_dir, "table3", rows, "Table 3 (twins vs paper)")
    by = {r["dataset"]: r for r in rows}
    assert len(rows) == 7
    # shape: CW is the largest twin; EU near-regular; web graphs hubby
    assert by["CW"]["E"] == max(r["E"] for r in rows)
    assert by["EU"]["d_max"] <= 10
    assert by["UK"]["d_max"] / by["UK"]["V"] > by["LJ"]["d_max"] / by["LJ"]["V"]
    for r in rows:
        assert abs(r["d_avg"] - r["paper_d_avg"]) / r["paper_d_avg"] < 1.0
