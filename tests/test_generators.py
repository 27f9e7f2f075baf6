"""Unit tests for the synthetic graph generators (no Spark needed)."""
import numpy as np
import pandas as pd
import pytest

from repro.graphs.generators import (
    DATASETS,
    chung_lu,
    dataset,
    erdos_renyi,
    hub_web,
    road_grid,
)


def degrees_of(pdf: pd.DataFrame) -> pd.Series:
    return pd.concat([pdf["a"], pdf["b"]]).value_counts()


def test_chung_lu_canonical_form():
    pdf = chung_lu(500, 2000, seed=3)
    assert (pdf["a"] < pdf["b"]).all(), "edges must be canonical a<b"
    assert not pdf.duplicated().any()


def test_chung_lu_deterministic():
    a = chung_lu(400, 1500, seed=9)
    b = chung_lu(400, 1500, seed=9)
    pd.testing.assert_frame_equal(a, b)


def test_chung_lu_seed_changes_graph():
    a = chung_lu(400, 1500, seed=1)
    b = chung_lu(400, 1500, seed=2)
    assert not a.equals(b)


def test_chung_lu_edge_budget():
    pdf = chung_lu(1000, 5000, seed=0)
    assert 3000 <= len(pdf) <= 5200  # dedupe losses bounded


def test_chung_lu_covers_all_vertices():
    pdf = chung_lu(300, 900, seed=5)
    present = set(pdf["a"]) | set(pdf["b"])
    assert present == set(range(300))


def test_chung_lu_skew():
    """Power-law twin must be much more skewed than uniform."""
    cl = degrees_of(chung_lu(2000, 10000, gamma=2.2, seed=0))
    er = degrees_of(erdos_renyi(2000, 10000, seed=0))
    assert cl.max() > 3 * er.max()


def test_chung_lu_dmax_cap():
    pdf = chung_lu(2000, 10000, gamma=2.05, d_max_frac=0.05, seed=0)
    # Cap limits the expected hub degree; allow stochastic slack.
    assert degrees_of(pdf).max() <= 2000 * 0.05 * 2.5


def test_erdos_renyi_near_regular():
    deg = degrees_of(erdos_renyi(2000, 10000, seed=1))
    assert deg.max() < deg.mean() * 4


def test_road_grid_structure():
    pdf = road_grid(20, extra_frac=0.0, seed=0)
    assert len(pdf) == 2 * 20 * 19  # grid edge count
    deg = degrees_of(pdf)
    assert deg.max() == 4  # interior vertices


def test_road_grid_with_shortcuts():
    pdf = road_grid(20, extra_frac=0.1, seed=0)
    assert len(pdf) > 2 * 20 * 19


def test_hub_web_has_extreme_hub():
    pdf = hub_web(3000, 20000, seed=2)
    deg = degrees_of(pdf)
    # hubs live in the lowest ids and should dwarf the body
    assert deg.max() > 8 * deg.mean()


@pytest.mark.parametrize("name", sorted(DATASETS))
def test_named_dataset_generates(name):
    pdf = dataset(name, scale=0.2)
    assert len(pdf) > 50
    assert (pdf["a"] < pdf["b"]).all()
    assert not pdf.duplicated().any()


@pytest.mark.parametrize("name", sorted(DATASETS))
def test_named_dataset_deterministic(name):
    pd.testing.assert_frame_equal(dataset(name, scale=0.2), dataset(name, scale=0.2))


def test_dataset_scale_grows_graph():
    small = dataset("LJ", scale=0.2)
    big = dataset("LJ", scale=0.6)
    assert len(big) > 2 * len(small)


def test_eu_twin_is_near_regular_like_paper():
    """Paper's EU road graph: d_max=20, d_avg=3.9 — near regular."""
    deg = degrees_of(dataset("EU", scale=0.5))
    assert deg.max() <= 10


def test_cw_twin_is_most_hubby():
    """Paper's CW has d_max ~7.7% of |V| — the web twin must have the
    most extreme hub ratio of all twins."""
    ratios = {}
    for name in ("LJ", "CW", "EU"):
        pdf = dataset(name, scale=0.3)
        deg = degrees_of(pdf)
        n = max(pdf["b"].max(), pdf["a"].max()) + 1
        ratios[name] = deg.max() / n
    assert ratios["CW"] > ratios["LJ"] > ratios["EU"]


def test_paper_reference_rows_present():
    for spec in DATASETS.values():
        v, e, dmax, davg = spec.paper
        assert v > 0 and e > 0 and dmax > 0 and davg > 0
