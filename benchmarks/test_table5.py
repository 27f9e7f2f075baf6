"""Benchmark: Table 5 — cache designs replayed on real access traces.

Shape target (paper): LRBU < LRBU-Copy < LRBU-Lock < LRU-Inf < Cncr-LRU
on every query, with the fetch stage a small share of LRBU's total.
"""
from repro.exps.common import write_rows

from repro.exps.table5 import run_table5

ORDER = ["LRBU", "LRBU-Copy", "LRBU-Lock", "LRU-Inf", "Cncr-LRU"]


def test_table5(benchmark, spark, results_dir):
    rows = benchmark.pedantic(
        lambda: run_table5(spark, scale=1.0, k=10), rounds=1, iterations=1
    )
    write_rows(results_dir, "table5", rows, "Table 5 (cache replay)")
    for row in rows:
        times = [row[v] for v in ORDER]
        assert times == sorted(times), f"{row['query']}: {times}"
        assert row["LRBU_tf"] < 0.5 * row["LRBU"]
        assert row["LRBU_hits"] > 0
