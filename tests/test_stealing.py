"""Unit tests for two-layer work stealing (Exp-8's balance metric)."""
import numpy as np
import pytest

from repro.sched.stealing import (
    balance_nostl,
    balance_rgp,
    balance_steal,
    powerlaw_task_costs,
)

N_WORKERS = 40  # 10 machines x 4 workers, as the paper's local cluster


@pytest.fixture(scope="module")
def workload():
    return powerlaw_task_costs(20_000, seed=3)


def test_costs_deterministic():
    a, _ = powerlaw_task_costs(1000, seed=1)
    b, _ = powerlaw_task_costs(1000, seed=1)
    assert np.allclose(a, b)


def test_costs_are_skewed():
    costs, _ = powerlaw_task_costs(20_000, seed=0)
    assert costs.max() > 10 * np.median(costs)


def test_stealing_best_balance(workload):
    """Exp-8's headline: stealing's std-dev beats RGP beats NOSTL."""
    costs, pivots = workload
    st = balance_steal(costs, pivots, N_WORKERS)
    rgp = balance_rgp(costs, pivots, N_WORKERS)
    nostl = balance_nostl(costs, pivots, N_WORKERS)
    assert st.stddev_s < rgp.stddev_s
    assert st.stddev_s < nostl.stddev_s


def test_stealing_near_optimal_makespan(workload):
    costs, pivots = workload
    st = balance_steal(costs, pivots, N_WORKERS)
    lower_bound = max(costs.sum() / N_WORKERS, costs.max())
    assert st.makespan_s <= 1.3 * lower_bound


def test_stealing_overhead_tiny(workload):
    """Exp-8: total CPU increases only ~0.017% under stealing."""
    costs, pivots = workload
    st = balance_steal(costs, pivots, N_WORKERS)
    nostl = balance_nostl(costs, pivots, N_WORKERS)
    assert st.total_cpu_s <= nostl.total_cpu_s * 1.01


def test_static_policies_conserve_work(workload):
    costs, pivots = workload
    for res in (
        balance_nostl(costs, pivots, N_WORKERS),
        balance_rgp(costs, pivots, N_WORKERS),
    ):
        assert res.total_cpu_s == pytest.approx(costs.sum())
        assert res.steals == 0


def test_steal_count_positive_under_skew(workload):
    costs, pivots = workload
    assert balance_steal(costs, pivots, N_WORKERS).steals > 0


def test_balanced_load_needs_no_rebalancing():
    """With perfectly uniform tasks, all policies tie (≈ no skew)."""
    costs = np.full(4000, 1e-4)
    pivots = np.arange(4000)
    st = balance_steal(costs, pivots, N_WORKERS)
    nostl = balance_nostl(costs, pivots, N_WORKERS)
    assert st.makespan_s == pytest.approx(nostl.makespan_s, rel=0.05)


def test_single_worker_degenerate():
    costs, pivots = powerlaw_task_costs(100, seed=5)
    res = balance_steal(costs, pivots, 1, workers_per_machine=1)
    assert res.makespan_s == pytest.approx(costs.sum())
    assert res.stddev_s == 0.0


def test_policies_labelled():
    costs, pivots = powerlaw_task_costs(100, seed=6)
    assert balance_nostl(costs, pivots, 4).policy == "nostl"
    assert balance_rgp(costs, pivots, 4).policy == "rgp"
    assert balance_steal(costs, pivots, 4).policy == "steal"
