"""Benchmark-local fixtures: result sink for reproduced tables.

Each table benchmark writes its measured rows to ``bench_results/`` so
EXPERIMENTS.md side-by-sides can be refreshed from the latest run.
"""
import pathlib

import pytest

RESULTS_DIR = pathlib.Path(__file__).resolve().parent.parent / "bench_results"


@pytest.fixture(scope="session")
def results_dir() -> pathlib.Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    return RESULTS_DIR
