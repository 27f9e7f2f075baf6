"""Benchmark: Table 1 — square on the LJ twin, five systems.

Regenerates the paper's Table 1 rows (T, T_R, T_C, C, M per system) and
asserts the headline shapes: HUGE wins total time with the smallest
communication volume; the pushing systems move the most data; BENU is
computation-dominated; memory is smallest for BENU/HUGE.
"""
from repro.exps.common import write_rows

from repro.exps.table1 import run_table1


def test_table1(benchmark, spark, results_dir):
    rows = benchmark.pedantic(
        lambda: run_table1(spark, scale=1.0, k=10), rounds=1, iterations=1
    )
    write_rows(results_dir, "table1", rows, "Table 1 (measured)")
    by = {r["work"]: r for r in rows}
    assert by["HUGE"]["T_s"] == min(r["T_s"] for r in rows)
    assert by["HUGE"]["C_MB"] == min(r["C_MB"] for r in rows)
    assert by["BENU"]["T_s"] == max(r["T_s"] for r in rows)
    # pushing systems move the most data; RADS tops the pulling side
    assert by["SEED"]["C_MB"] > 2 * by["BENU"]["C_MB"]
    assert by["BIGJOIN"]["C_MB"] > 2 * by["HUGE"]["C_MB"]
    assert by["RADS"]["C_MB"] > by["HUGE"]["C_MB"]
    # BENU: tiny C and tiny M, but computation-dominated (k/v overhead)
    assert by["BENU"]["T_R_s"] > 0.9 * by["BENU"]["T_s"]
    assert by["BENU"]["M_MB"] == min(r["M_MB"] for r in rows)
    # HUGE's communication time is a small fraction of its total
    assert by["HUGE"]["T_C_s"] < 0.2 * by["HUGE"]["T_s"]
