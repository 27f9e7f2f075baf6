"""Tests for the two-stage fetch/intersect replay and Table-5 variants."""
import numpy as np
import pytest

from repro.cache.replay import VARIANTS, Trace, replay, replay_all


def make_trace(
    n_batches: int = 20,
    batch: int = 200,
    n_vertices: int = 500,
    *,
    skew: bool = True,
    seed: int = 0,
) -> Trace:
    """One machine's remote accesses: zipf-ish vertex popularity so a
    cache has something to hit."""
    rng = np.random.default_rng(seed)
    if skew:
        p = 1.0 / np.arange(1, n_vertices + 1) ** 1.2
        p /= p.sum()
    else:
        p = None
    out = []
    for _ in range(n_batches):
        vids = rng.choice(n_vertices, size=batch, p=p)
        out.append([(int(v), int(v % 40) + 1) for v in vids])
    return out


@pytest.fixture(scope="module")
def traces():
    return [make_trace(seed=s) for s in range(4)]


def test_replay_all_has_all_variants(traces):
    res = replay_all(traces, capacity_units=5000)
    assert set(res) == set(VARIANTS)


def test_table5_ordering(traces):
    """The paper's Table 5 ordering must emerge from the cost mechanisms:
    LRBU < LRBU-Copy < LRBU-Lock < LRU-Inf < Cncr-LRU."""
    res = replay_all(traces, capacity_units=5000)
    assert (
        res["LRBU"].sim_s
        < res["LRBU-Copy"].sim_s
        < res["LRBU-Lock"].sim_s
        < res["LRU-Inf"].sim_s
        < res["Cncr-LRU"].sim_s
    )


def test_fetch_stage_is_small_fraction(traces):
    """Exp-6: t_f is a small share of LRBU's total (paper: ~7.5%)."""
    r = replay_all(traces, capacity_units=5000)["LRBU"]
    assert 0 < r.fetch_s < 0.5 * r.sim_s


def test_hits_plus_misses_accounts_distinct_accesses(traces):
    r = replay_all(traces, capacity_units=5000)["LRBU"]
    distinct_per_batch = sum(
        len({v for v, _ in b}) for t in traces for b in t
    )
    assert r.hits + r.misses == distinct_per_batch


def test_bigger_cache_fewer_misses(traces):
    small = replay_all(traces, capacity_units=500)["LRBU"]
    big = replay_all(traces, capacity_units=50_000)["LRBU"]
    assert big.misses < small.misses
    assert big.pulled_bytes < small.pulled_bytes


def test_skewed_stream_hits_more_than_uniform():
    skewed = [make_trace(skew=True, seed=1)]
    uniform = [make_trace(skew=False, seed=1)]
    rs = replay_all(skewed, capacity_units=2000)["LRBU"]
    ru = replay_all(uniform, capacity_units=2000)["LRBU"]
    rate_s = rs.hits / (rs.hits + rs.misses)
    rate_u = ru.hits / (ru.hits + ru.misses)
    assert rate_s > rate_u


def test_lru_inf_never_misses_twice():
    """Infinite capacity: every vertex misses at most once."""
    t = [make_trace(seed=2)]
    r = replay_all(t, capacity_units=100)["LRU-Inf"]
    distinct_vertices = len({v for b in t[0] for v, _ in b})
    assert r.misses == distinct_vertices


def test_overflow_bounded_by_batch_remote_set(traces):
    """LRBU may overflow, but by no more than one batch's remote units
    (the §4.4 bounded-overflow argument)."""
    r = replay_all(traces, capacity_units=800)["LRBU"]
    max_batch_units = max(
        sum(d for _, d in {v: d for v, d in b}.items())
        for t in traces
        for b in t
    )
    assert r.max_overflow_units <= max_batch_units


def test_empty_traces():
    r = replay_all([[]], capacity_units=100)
    assert r["LRBU"].sim_s == 0.0
    assert r["LRBU"].hits == 0 and r["LRBU"].misses == 0


def test_parallel_machines_use_max_not_sum():
    one = [make_trace(seed=3)]
    four = [make_trace(seed=3) for _ in range(4)]
    r1 = replay_all(one, capacity_units=5000)["LRBU"]
    r4 = replay_all(four, capacity_units=5000)["LRBU"]
    assert r4.sim_s == pytest.approx(r1.sim_s, rel=1e-6)


def test_cncr_lru_pays_per_access_rpc():
    """Disabling two-stage execution forfeits RPC batching: Cncr-LRU's
    time is dominated by per-miss round trips."""
    t = [make_trace(n_batches=5, batch=100, skew=False, seed=4)]
    res = replay_all(t, capacity_units=200)
    assert res["Cncr-LRU"].sim_s > 2 * res["LRBU"].sim_s
