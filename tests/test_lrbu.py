"""Unit tests for the LRBU cache (Algorithm 3) and the LRU baseline."""
import pytest

from repro.cache.lrbu import LRBUCache, LRUCache


def test_insert_get_roundtrip():
    c = LRBUCache(100)
    c.insert(5, [1, 2, 3])
    assert c.contains(5)
    assert c.get(5) == [1, 2, 3]


def test_contains_absent():
    c = LRBUCache(100)
    assert not c.contains(42)


def test_size_units_counts_neighbours():
    c = LRBUCache(100)
    c.insert(1, [0] * 10)
    c.insert(2, [0] * 5)
    assert c.size_units == 15
    assert len(c) == 2


def test_eviction_pops_smallest_order_first():
    c = LRBUCache(10)
    c.insert(1, [0] * 5)  # order 0
    c.insert(2, [0] * 5)  # order 1
    c.insert(3, [0] * 5)  # forces eviction of vid 1 (smallest order)
    assert not c.contains(1)
    assert c.contains(2) and c.contains(3)
    assert c.evictions == 1


def test_sealed_vertex_survives_eviction():
    c = LRBUCache(10)
    c.insert(1, [0] * 5)
    c.insert(2, [0] * 5)
    c.seal(1)  # pin vid 1 for this batch
    c.insert(3, [0] * 5)  # must evict vid 2, not the sealed vid 1
    assert c.contains(1)
    assert not c.contains(2)


def test_overflow_when_free_set_empty():
    """Algorithm 3: if S_free is empty the insert happens regardless of
    capacity — the cache overflows (bounded by the batch's remote set)."""
    c = LRBUCache(10)
    c.insert(1, [0] * 5)
    c.insert(2, [0] * 5)
    c.seal(1)
    c.seal(2)
    c.insert(3, [0] * 8)  # nothing evictable
    assert c.contains(1) and c.contains(2) and c.contains(3)
    assert c.size_units == 18
    assert c.max_overflow_units == 8


def test_release_makes_sealed_evictable_again():
    c = LRBUCache(10)
    c.insert(1, [0] * 5)
    c.seal(1)
    c.release()
    c.insert(2, [0] * 5)
    c.insert(3, [0] * 5)  # now vid 1 is evictable again
    assert not c.contains(1)


def test_release_assigns_largest_order():
    """Released vertices become the *most recently batched*: with older
    unsealed entries present, those older entries evict first."""
    c = LRBUCache(10)
    c.insert(1, [0] * 5)  # order 0, never sealed
    c.insert(2, [0] * 5)  # order 1
    c.seal(2)
    c.release()  # vid 2 re-enters S_free with order > vid 1's
    c.insert(3, [0] * 5)  # evicts vid 1 (least recent batch)
    assert not c.contains(1)
    assert c.contains(2)


def test_lrbu_get_does_not_change_eviction_order():
    """The defining LRBU property: reads are order-neutral (unlike LRU),
    only batch membership (seal/release) changes replacement order."""
    c = LRBUCache(10)
    c.insert(1, [0] * 5)
    c.insert(2, [0] * 5)
    c.get(1)  # would refresh vid 1 in an LRU
    c.insert(3, [0] * 5)
    assert not c.contains(1)  # still evicted first


def test_seal_of_absent_vertex_is_safe():
    c = LRBUCache(10)
    c.seal(99)
    c.release()
    assert not c.contains(99)


def test_free_and_sealed_views():
    c = LRBUCache(100)
    c.insert(1, [0])
    c.insert(2, [0])
    c.seal(1)
    assert c.sealed() == frozenset({1})
    assert c.free() == frozenset({2})
    c.release()
    assert c.sealed() == frozenset()
    assert c.free() == frozenset({1, 2})


def test_unbounded_cache_never_evicts():
    c = LRBUCache(0)
    for i in range(1000):
        c.insert(i, [0] * 7)
    assert len(c) == 1000
    assert c.evictions == 0


def test_multi_eviction_for_large_insert():
    c = LRBUCache(10)
    for i in range(5):
        c.insert(i, [0] * 2)
    c.insert(99, [0] * 9)  # needs several evictions
    assert c.contains(99)
    assert c.size_units <= 11


# -- LRU baseline ----------------------------------------------------------


def test_lru_get_refreshes_position():
    c = LRUCache(10)
    c.insert(1, [0] * 5)
    c.insert(2, [0] * 5)
    c.get(1)  # refresh: vid 2 becomes LRU
    c.insert(3, [0] * 5)
    assert c.contains(1)
    assert not c.contains(2)


def test_lru_eviction_order_without_gets():
    c = LRUCache(10)
    c.insert(1, [0] * 5)
    c.insert(2, [0] * 5)
    c.insert(3, [0] * 5)
    assert not c.contains(1)


def test_lru_unbounded():
    c = LRUCache(0)
    for i in range(100):
        c.insert(i, [0])
    assert len(c) == 100
