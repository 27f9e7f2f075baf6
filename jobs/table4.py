"""spark-submit entrypoint for Table 4 (throughput on the CW twin)."""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_session  # noqa: E402

from repro.exps.common import format_table  # noqa: E402
from repro.exps.table4 import run_table4  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--k", type=int, default=16)
    args = ap.parse_args()
    spark = get_session("table4")
    try:
        print(format_table(run_table4(spark, scale=args.scale, k=args.k), "Table 4 (throughput on CW twin)"))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
