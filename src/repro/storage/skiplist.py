"""Two-layer time-series skiplist (paper Section 7.2).

The first layer is a probabilistic skiplist ordered by key (e.g. user id);
each key node points to a second-layer time list holding all tuples for
that key ordered by timestamp **descending** (newest first), which makes
"latest N" and trailing-window scans start at the head — the access
pattern online feature computation needs.

The paper's implementation is lock-free via CAS pointer updates; here a
single-threaded deterministic variant reproduces the *semantics* the
experiments exercise (ordering, range scans, TTL batch eviction) — see
DESIGN.md's substitution table. The probabilistic level structure is kept
(seeded RNG) so search is genuinely O(log n_keys) in the key layer.
"""
from __future__ import annotations

import bisect
import random
from dataclasses import dataclass, field
from typing import Any, Iterator

_MAX_LEVEL = 12
_P = 0.25


class TimeList:
    """Per-key second layer: time-ordered entries with O(log n) seek.

    The paper's second layer is "a linked list (or a secondary skiplist)";
    a plain linked list cannot seek to an old timestamp without walking
    every newer node, which would make pre-aggregation's raw-edge lookups
    O(window). This implementation keeps the entries as an ascending
    sorted array with binary search — the same O(log n) positioning a
    secondary skiplist provides (see DESIGN.md's substitution table).
    Ties on ts preserve insertion order; newest-first iteration therefore
    yields later-inserted entries first.
    """

    __slots__ = ("_ts", "_vals")

    def __init__(self) -> None:
        self._ts: list[int] = []
        self._vals: list[Any] = []

    @property
    def size(self) -> int:
        return len(self._ts)

    def insert(self, ts: int, value: Any) -> None:
        if not self._ts or ts >= self._ts[-1]:
            # The common streaming case — monotone arrivals — is O(1).
            self._ts.append(ts)
            self._vals.append(value)
            return
        pos = bisect.bisect_right(self._ts, ts)
        self._ts.insert(pos, ts)
        self._vals.insert(pos, value)

    def scan_range(self, ts_lo: int, ts_hi: int) -> Iterator[tuple[int, Any]]:
        """Yield (ts, value) with ts in (ts_lo, ts_hi], newest first."""
        i = bisect.bisect_right(self._ts, ts_lo)
        j = bisect.bisect_right(self._ts, ts_hi)
        for k in range(j - 1, i - 1, -1):
            yield self._ts[k], self._vals[k]

    def latest(self, n: int = 1) -> list[tuple[int, Any]]:
        return [
            (self._ts[k], self._vals[k])
            for k in range(len(self._ts) - 1, max(-1, len(self._ts) - 1 - n), -1)
        ]

    def latest_before(self, ts_hi: int) -> tuple[int, Any] | None:
        """Most recent entry with ts <= ts_hi (LAST JOIN's lookup)."""
        j = bisect.bisect_right(self._ts, ts_hi)
        if j == 0:
            return None
        return self._ts[j - 1], self._vals[j - 1]

    def evict_before(self, ts_min: int) -> int:
        """Batch-delete all entries with ts < ts_min; returns count removed.

        Outdated tuples are contiguous at the old end, so this is one
        boundary search plus a single slice cut."""
        idx = bisect.bisect_left(self._ts, ts_min)
        if idx:
            del self._ts[:idx]
            del self._vals[:idx]
        return idx

    def __iter__(self) -> Iterator[tuple[int, Any]]:
        for k in range(len(self._ts) - 1, -1, -1):
            yield self._ts[k], self._vals[k]


@dataclass
class _KeyNode:
    key: Any
    times: TimeList
    forward: list = field(default_factory=list)


class TimeSeriesSkipList:
    """Key-ordered skiplist of :class:`TimeList` buckets."""

    def __init__(self, *, seed: int = 0) -> None:
        self._rng = random.Random(seed)
        self._head = _KeyNode(None, TimeList(), [None] * _MAX_LEVEL)
        self._level = 1
        self.n_keys = 0
        self.n_entries = 0

    def _random_level(self) -> int:
        lvl = 1
        while lvl < _MAX_LEVEL and self._rng.random() < _P:
            lvl += 1
        return lvl

    def _find(self, key: Any) -> tuple[_KeyNode | None, list[_KeyNode]]:
        update = [self._head] * _MAX_LEVEL
        cur = self._head
        for lvl in range(self._level - 1, -1, -1):
            while cur.forward[lvl] is not None and cur.forward[lvl].key < key:
                cur = cur.forward[lvl]
            update[lvl] = cur
        nxt = cur.forward[0]
        return (nxt if nxt is not None and nxt.key == key else None, update)

    def get(self, key: Any) -> TimeList | None:
        node, _ = self._find(key)
        return node.times if node is not None else None

    def put(self, key: Any, ts: int, value: Any) -> None:
        node, update = self._find(key)
        if node is None:
            lvl = self._random_level()
            self._level = max(self._level, lvl)
            node = _KeyNode(key, TimeList(), [None] * _MAX_LEVEL)
            for i in range(lvl):
                node.forward[i] = update[i].forward[i]
                update[i].forward[i] = node
            self.n_keys += 1
        node.times.insert(ts, value)
        self.n_entries += 1

    def evict_before(self, ts_min: int) -> int:
        """TTL batch eviction across all keys; returns entries removed."""
        removed = 0
        cur = self._head.forward[0]
        while cur is not None:
            removed += cur.times.evict_before(ts_min)
            cur = cur.forward[0]
        self.n_entries -= removed
        return removed

    def keys(self) -> Iterator[Any]:
        cur = self._head.forward[0]
        while cur is not None:
            yield cur.key
            cur = cur.forward[0]

    def items(self) -> Iterator[tuple[Any, TimeList]]:
        cur = self._head.forward[0]
        while cur is not None:
            yield cur.key, cur.times
            cur = cur.forward[0]
