"""Property-based tests (hypothesis) for the cache and the scheduler."""
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.cache.lrbu import LRBUCache
from repro.sched.scheduler import SimOp, simulate

# -- LRBU invariants -------------------------------------------------------

ops = st.lists(
    st.tuples(
        st.sampled_from(["insert", "get", "seal", "release"]),
        st.integers(0, 30),
        st.integers(1, 12),
    ),
    max_size=200,
)


@given(ops)
@settings(max_examples=150, deadline=None)
def test_lrbu_never_loses_sealed_entries(sequence):
    """Whatever the operation sequence, a sealed-and-cached vertex can
    only leave the cache after Release."""
    c = LRBUCache(capacity_units=20)
    sealed: set[int] = set()
    for op, vid, deg in sequence:
        if op == "insert":
            c.insert(vid, [0] * deg)
            if vid in sealed:
                sealed.discard(vid)  # re-insert puts it in S_free
        elif op == "get":
            if c.contains(vid):
                assert c.get(vid) is not None
        elif op == "seal":
            if c.contains(vid):
                c.seal(vid)
                sealed.add(vid)
        else:
            c.release()
            sealed.clear()
        for v in sealed:
            assert c.contains(v), f"sealed vertex {v} evicted"


@given(ops)
@settings(max_examples=100, deadline=None)
def test_lrbu_size_accounting_consistent(sequence):
    c = LRBUCache(capacity_units=25)
    for op, vid, deg in sequence:
        if op == "insert":
            c.insert(vid, [0] * deg)
        elif op == "seal" and c.contains(vid):
            c.seal(vid)
        elif op == "release":
            c.release()
    recomputed = sum(max(1, len(c.get(v))) for v in list(c.free() | c.sealed()))
    assert c.size_units == recomputed


@given(
    st.integers(1, 5000),
    st.lists(st.floats(0.0, 5.0), min_size=1, max_size=4),
    st.integers(10, 500),
    st.one_of(st.none(), st.integers(50, 5000)),
)
@settings(max_examples=60, deadline=None)
def test_scheduler_conserves_tuples(n_source, ratios, batch, cap):
    """Algorithm 5 must deliver exactly prod(ratios) * n_source tuples
    to SINK for any queue capacity."""
    sim_ops = [SimOp(f"o{i}", r, i + 3) for i, r in enumerate(ratios)]
    res = simulate(float(n_source), sim_ops, batch=float(batch), queue_cap=cap)
    expected = float(n_source)
    for r in ratios:
        expected *= r
    assert abs(res.sunk - expected) < 1e-6 * max(1.0, expected)


@given(st.integers(100, 3000), st.integers(10, 200))
@settings(max_examples=40, deadline=None)
def test_scheduler_dfs_memory_bound(n_source, batch):
    """DFS (cap == batch) peak memory stays within one batch's expansion
    per operator — Lemma 5.2's shape."""
    sim_ops = [SimOp("a", 3.0, 3), SimOp("b", 2.0, 4)]
    res = simulate(float(n_source), sim_ops, batch=float(batch), queue_cap=batch)
    bound = (len(sim_ops) + 1) * batch * (1 + 3.0)
    assert res.peak_mem_tuples <= bound
