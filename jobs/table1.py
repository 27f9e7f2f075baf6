"""spark-submit entrypoint for Table 1 (square on LJ, five systems)."""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_session  # noqa: E402

from repro.exps.common import format_table  # noqa: E402
from repro.exps.table1 import PAPER_ROWS, run_table1  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--k", type=int, default=10)
    ap.add_argument("--query", default="q1")
    args = ap.parse_args()
    spark = get_session("table1")
    try:
        rows = run_table1(spark, scale=args.scale, k=args.k, query=args.query)
        print(format_table(rows, "Table 1 (measured, mini-scale)"))
        print(format_table(PAPER_ROWS, "Table 1 (paper)"))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
