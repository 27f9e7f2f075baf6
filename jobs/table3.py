"""spark-submit entrypoint for Table 3 (dataset statistics, twins vs paper)."""
import argparse
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))
from _session import get_session  # noqa: E402

from repro.exps.common import format_table  # noqa: E402
from repro.exps.table3 import run_table3  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser(description=__doc__)
    ap.add_argument("--scale", type=float, default=1.0)
    args = ap.parse_args()
    spark = get_session("table3")
    try:
        print(format_table(run_table3(spark, scale=args.scale), "Table 3 (twins vs paper)"))
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
