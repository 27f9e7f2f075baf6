"""spark-submit entrypoint for Table 6 (hybrid plans on the GO twin)."""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_session  # noqa: E402

from repro.exps.common import format_table  # noqa: E402
from repro.exps.table6 import PAPER_ROWS, run_table6  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--k", type=int, default=10)
    args = ap.parse_args()
    spark = get_session("table6")
    try:
        rows = run_table6(spark, scale=args.scale, k=args.k)
        print(format_table(rows, "Table 6 (measured)"))
        print(format_table(PAPER_ROWS, "Table 6 (paper)"))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
