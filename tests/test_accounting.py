"""Unit tests for the simulated-testbed accounting model."""
import pytest

from repro.core.accounting import (
    BYTES_PER_VID,
    KV_ACCESS_S,
    NETWORK_BYTES_PER_S,
    SPILL_THRESHOLD_BYTES,
    UTIL_BARRIER_SHUFFLE,
    UTIL_BATCHED_PULL,
    UTIL_SPILLED_SHUFFLE,
    OpStats,
    RunStats,
    op_spills,
)


def mk_run(k=10, kv=False):
    return RunStats(k=k, kv_model=kv)


def test_opstats_bytes():
    o = OpStats("x", out_rows=100, out_arity=4)
    assert o.out_bytes == 100 * 4 * BYTES_PER_VID
    assert o.comm_bytes == 0.0


def test_comm_bytes_sums_push_and_pull():
    r = mk_run()
    r.add(OpStats("a", push_bytes=100.0))
    r.add(OpStats("b", pull_bytes=50.0))
    assert r.comm_bytes == 150.0
    assert r.push_bytes == 100.0 and r.pull_bytes == 50.0


def test_pull_wire_time_uses_batched_utilisation():
    r = mk_run(k=10)
    r.add(OpStats("a", pull_bytes=1e6))
    expected = 1e6 / (10 * NETWORK_BYTES_PER_S * UTIL_BATCHED_PULL)
    assert r.t_comm_s == pytest.approx(expected)


def test_barrier_shuffle_spill_collapses_utilisation():
    """A spilling shuffle is both slower on the wire and pays disk I/O."""
    small = mk_run(k=10)
    small.add(OpStats("j", push_bytes=1e5, barrier=True, buffer_bytes=1e5))
    big = mk_run(k=10)
    big.add(OpStats("j", push_bytes=1e5, barrier=True, buffer_bytes=1e9))
    assert big.t_comm_s > small.t_comm_s
    assert big.t_compute_s > small.t_compute_s
    ratio = big.t_comm_s / small.t_comm_s
    assert ratio == pytest.approx(UTIL_BARRIER_SHUFFLE / UTIL_SPILLED_SHUFFLE)


def test_op_spills_threshold():
    o = OpStats("j", barrier=True, buffer_bytes=SPILL_THRESHOLD_BYTES * 10 * 2)
    assert op_spills(o, 10)
    o2 = OpStats("j", barrier=True, buffer_bytes=SPILL_THRESHOLD_BYTES * 10 / 2)
    assert not op_spills(o2, 10)


def test_pull_join_never_spills():
    o = OpStats("j", barrier=False, buffer_bytes=1e12)
    assert not op_spills(o, 10)


def test_kv_model_charges_accesses_to_compute():
    benu = mk_run(kv=True)
    benu.add(OpStats("e", accesses=1_000_000))
    huge = mk_run(kv=False)
    huge.add(OpStats("e", accesses=1_000_000))
    assert benu.t_compute_s > huge.t_compute_s
    assert benu.t_compute_s >= 1_000_000 * KV_ACCESS_S / 10 * 0.99


def test_rpc_overhead_counts_pull_requests():
    a = mk_run()
    a.add(OpStats("e", pull_requests=0))
    b = mk_run()
    b.add(OpStats("e", pull_requests=100_000))
    assert b.t_comm_s > a.t_comm_s


def test_total_is_compute_plus_comm():
    r = mk_run()
    r.add(OpStats("e", wall_s=2.0, pull_bytes=1e6))
    assert r.t_total_s == pytest.approx(r.t_compute_s + r.t_comm_s)


def test_measured_wall_sums():
    r = mk_run()
    r.add(OpStats("a", wall_s=1.0))
    r.add(OpStats("b", wall_s=2.5))
    assert r.measured_wall_s == pytest.approx(3.5)


def test_table_row_shape():
    r = mk_run()
    r.add(OpStats("a", wall_s=1.0, pull_bytes=2e6))
    r.result_count = 42
    r.peak_mem_bytes = 3e6
    row = r.table_row("HUGE")
    assert row["work"] == "HUGE"
    assert row["results"] == 42
    assert row["C_MB"] == pytest.approx(2.0)
    assert row["M_MB"] == pytest.approx(3.0)
    assert row["T_s"] == pytest.approx(row["T_R_s"] + row["T_C_s"], abs=0.01)


def test_streaming_push_faster_than_spilled_barrier():
    stream = mk_run(k=10)
    stream.add(OpStats("e", push_bytes=1e7, barrier=False))
    barrier = mk_run(k=10)
    barrier.add(OpStats("j", push_bytes=1e7, barrier=True, buffer_bytes=1e9))
    assert stream.t_comm_s < barrier.t_comm_s
