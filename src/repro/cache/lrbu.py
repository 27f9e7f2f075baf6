"""LRBU — least-recent-batch-used cache (Algorithm 3).

Three members, exactly as the paper:

- ``M_cache``: remote vertex id -> neighbour list (we store the list so
  tests can check payloads; replay mostly uses its length);
- ``S_free``: an *ordered set* of evictable vertices — the vertex with
  the smallest order is replaced when the cache is full;
- ``S_sealed``: vertices pinned for the current batch (Seal/Release).

``Get``/``Contains`` are read-only (the lock-free, zero-copy reads of
§4.4); ``Insert`` evicts from ``S_free`` only, so a full cache with an
empty free set *overflows* — by at most the number of remote vertices
in one batch (the paper's bounded-overflow argument). ``Release`` moves
all sealed vertices back to ``S_free`` with an order larger than every
existing one, so eviction order is "least recent batch".

Capacity is counted in neighbour-list entries (≈ bytes / 8), and
eviction pops free vertices until the new entry fits (a size-aware
variant of the paper's pop-one; documented deviation).

A classic :class:`LRUCache` with the same interface backs the LRU-Inf
and Cncr-LRU rows of Table 5.
"""
from __future__ import annotations

import heapq
from collections import OrderedDict


class LRBUCache:
    """Algorithm 3. ``capacity_units`` in adjacency entries; 0 = unbounded."""

    def __init__(self, capacity_units: int = 0):
        self.capacity = capacity_units
        self._cache: dict[int, list[int]] = {}  # M_cache
        self._free_ord: dict[int, int] = {}  # S_free: vid -> order
        self._free_heap: list[tuple[int, int]] = []  # lazy (order, vid)
        self._sealed: set[int] = set()  # S_sealed
        self._next_ord = 0
        self._size_units = 0
        self.evictions = 0
        self.max_overflow_units = 0

    # -- read-only methods (lock-free in the paper) ------------------------
    def get(self, vid: int) -> list[int]:
        return self._cache[vid]

    def contains(self, vid: int) -> bool:
        return vid in self._cache

    # -- mutating methods --------------------------------------------------
    def insert(self, vid: int, neighbours: list[int]) -> None:
        units = max(1, len(neighbours))
        if vid in self._cache:  # re-insert: drop the old entry first
            old = self._cache.pop(vid)
            self._size_units -= max(1, len(old))
            self._free_ord.pop(vid, None)
            self._sealed.discard(vid)
        if self.capacity:
            while (
                self._size_units + units > self.capacity and self._pop_smallest()
            ):
                pass
        self._cache[vid] = neighbours
        self._size_units += units
        self._free_ord[vid] = self._next_ord
        heapq.heappush(self._free_heap, (self._next_ord, vid))
        self._next_ord += 1
        if self.capacity and self._size_units > self.capacity:
            self.max_overflow_units = max(
                self.max_overflow_units, self._size_units - self.capacity
            )

    def seal(self, vid: int) -> None:
        self._free_ord.pop(vid, None)  # lazily dropped from the heap
        self._sealed.add(vid)

    def release(self) -> None:
        for vid in self._sealed:
            if vid in self._cache:
                self._free_ord[vid] = self._next_ord
                heapq.heappush(self._free_heap, (self._next_ord, vid))
        self._next_ord += 1  # whole batch shares one (larger) order
        self._sealed.clear()

    # -- internals ---------------------------------------------------------
    def _pop_smallest(self) -> bool:
        """Evict the free vertex with the smallest order; False if none."""
        while self._free_heap:
            order, vid = heapq.heappop(self._free_heap)
            if self._free_ord.get(vid) != order:
                continue  # stale heap entry (sealed or re-ordered)
            del self._free_ord[vid]
            self._size_units -= max(1, len(self._cache.pop(vid)))
            self.evictions += 1
            return True
        return False

    @property
    def size_units(self) -> int:
        return self._size_units

    def __len__(self) -> int:
        return len(self._cache)

    def sealed(self) -> frozenset[int]:
        return frozenset(self._sealed)

    def free(self) -> frozenset[int]:
        return frozenset(self._free_ord)


class LRUCache:
    """Classic LRU with the LRBU interface; every Get refreshes position
    (the extra mutation LRBU avoids). Seal/Release are no-ops — a plain
    LRU cannot pin entries, which is why it needs a lock per access."""

    def __init__(self, capacity_units: int = 0):
        self.capacity = capacity_units
        self._cache: "OrderedDict[int, list[int]]" = OrderedDict()
        self._size_units = 0
        self.evictions = 0
        self.max_overflow_units = 0

    def get(self, vid: int) -> list[int]:
        self._cache.move_to_end(vid)
        return self._cache[vid]

    def contains(self, vid: int) -> bool:
        return vid in self._cache

    def insert(self, vid: int, neighbours: list[int]) -> None:
        units = max(1, len(neighbours))
        if self.capacity:
            while self._size_units + units > self.capacity and self._cache:
                _, old = self._cache.popitem(last=False)
                self._size_units -= max(1, len(old))
                self.evictions += 1
        self._cache[vid] = neighbours
        self._size_units += units

    def seal(self, vid: int) -> None:  # pragma: no cover - interface parity
        pass

    def release(self) -> None:  # pragma: no cover - interface parity
        pass

    @property
    def size_units(self) -> int:
        return self._size_units

    def __len__(self) -> int:
        return len(self._cache)
