"""Unit tests for the BFS/DFS-adaptive scheduler simulation (Alg. 5)."""
import pytest

from repro.core.accounting import BYTES_PER_VID, OpStats, RunStats
from repro.sched.scheduler import (
    SimOp,
    line_ops_from_stats,
    simulate,
    theorem54_bound_bytes,
)

OPS = [SimOp("e1", 4.0, 3), SimOp("e2", 2.0, 4), SimOp("e3", 0.5, 5)]


def total_out(n_source, ops):
    x = n_source
    for o in ops:
        x *= o.ratio
    return x


def test_conservation_all_tuples_sunk():
    res = simulate(1000, OPS, batch=100, queue_cap=500)
    assert res.sunk == pytest.approx(total_out(1000, OPS))


def test_conservation_unbounded_bfs():
    res = simulate(1000, OPS, batch=100, queue_cap=None)
    assert res.sunk == pytest.approx(total_out(1000, OPS))


def test_conservation_dfs():
    res = simulate(1000, OPS, batch=100, queue_cap=100)
    assert res.sunk == pytest.approx(total_out(1000, OPS))


def test_bfs_peak_equals_largest_materialisation():
    """Unbounded queues hold whole intermediate result sets."""
    res = simulate(1000, OPS, batch=100, queue_cap=None)
    assert res.peak_mem_tuples >= 4000  # the e1 output fully queued


def test_adaptive_bounds_memory():
    cap = 500
    res = simulate(10_000, OPS, batch=100, queue_cap=cap)
    # queues ≤ cap + one batch's overflow per operator
    max_ratio = max(o.ratio for o in OPS)
    bound = (len(OPS) + 1) * (cap + 100 * max_ratio)
    assert res.peak_mem_tuples <= bound


def test_dfs_memory_below_bfs():
    dfs = simulate(10_000, OPS, batch=100, queue_cap=100)
    bfs = simulate(10_000, OPS, batch=100, queue_cap=None)
    assert dfs.peak_mem_tuples < bfs.peak_mem_tuples / 3


def test_memory_monotone_in_queue_cap():
    peaks = [
        simulate(10_000, OPS, batch=100, queue_cap=c).peak_mem_tuples
        for c in (100, 1000, 10_000, None)
    ]
    assert peaks == sorted(peaks)


def test_switch_count_decreases_with_queue_cap():
    """Exp-7's left side: small queues context-switch constantly."""
    small = simulate(10_000, OPS, batch=100, queue_cap=100)
    large = simulate(10_000, OPS, batch=100, queue_cap=10_000)
    assert small.switches > 2 * large.switches


def test_sim_time_dfs_slower_than_adaptive():
    """Exp-7: pure DFS pays switch overhead; the adaptive point is
    faster while keeping memory bounded."""
    dfs = simulate(50_000, OPS, batch=100, queue_cap=100)
    adaptive = simulate(50_000, OPS, batch=100, queue_cap=5_000)
    assert adaptive.sim_s < dfs.sim_s


def test_zero_ratio_terminates():
    res = simulate(1000, [SimOp("dead", 0.0, 2)], batch=100, queue_cap=500)
    assert res.sunk == 0.0


def test_single_op_line():
    res = simulate(100, [], batch=10, queue_cap=50)
    assert res.sunk == 100


def test_line_ops_from_stats_roundtrip():
    stats = RunStats(k=4)
    stats.add(OpStats("scan", out_rows=100, out_arity=2))
    stats.add(OpStats("e1", out_rows=400, out_arity=3))
    stats.add(OpStats("e2", out_rows=200, out_arity=4))
    src, ops = line_ops_from_stats(stats)
    assert src == 100
    assert [o.ratio for o in ops] == [4.0, 0.5]


def test_line_ops_from_stats_empty_raises():
    with pytest.raises(ValueError):
        line_ops_from_stats(RunStats())


def test_theorem54_bound_positive_and_quadratic():
    b4 = theorem54_bound_bytes(4, 100, 512e3)
    b8 = theorem54_bound_bytes(8, 100, 512e3)
    assert b8 == pytest.approx(4 * b4)
    assert b4 > 0


def test_peak_bytes_uses_arity():
    res = simulate(1000, OPS, batch=100, queue_cap=500)
    assert res.peak_mem_bytes == pytest.approx(
        res.peak_mem_tuples * 5 * BYTES_PER_VID
    )
