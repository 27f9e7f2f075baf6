"""Entrypoint for Table 2 (plan taxonomy, derived from generated plans)."""
import sys
from pathlib import Path

sys.path.insert(0, str(Path(__file__).parent))

from repro.exps.common import format_table  # noqa: E402
from repro.exps.table2 import PAPER_ROWS, run_table2  # noqa: E402


def main() -> None:
    print(format_table(run_table2(), "Table 2 (derived from our plan generators)"))
    print(format_table(PAPER_ROWS, "Table 2 (paper)"))


if __name__ == "__main__":
    main()
