"""Long-window pre-aggregation (paper Section 5.1).

A :class:`MultiLevelAggregator` maintains, per key, partial aggregate
states in time buckets at several granularities (e.g. second → minute →
hour). Updates are driven by the table's **binlog**: :meth:`catch_up`
applies entries strictly in offset order from the last applied offset —
the monotone-offset invariant the paper enforces with the replicator
lock — so the aggregator can run asynchronously behind inserts and
recover after a crash by resuming from ``last_offset``.

A request over ``[lo, hi]`` is *refined* (Section 5.1's query
refinement): the range decomposes into the coarsest fully-covered
buckets plus raw-data edges, and the answer is an ordered left-to-right
merge of those partial states — O(#buckets + edge rows) instead of
O(window rows). ``ew_avg`` is position-dependent and therefore not
decomposable; requesting it raises, and the engine falls back to the raw
scan (a real deployment must do the same).

Bucket hit counters per level support the paper's adaptive hierarchy:
:meth:`suggest_levels` drops levels that queries never touch.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any

import numpy as np

from repro.core.kernels import (
    DECOMPOSABLE,
    finalize_state,
    merge_states,
    partial_state,
)
from repro.online.memtable import MemTable


@dataclass
class LevelStats:
    """Query statistics for one granularity level."""

    granularity_ms: int
    bucket_hits: int = 0


class MultiLevelAggregator:
    """Pre-aggregated partial states for one (table, aggregate) pair."""

    def __init__(
        self,
        table: MemTable,
        *,
        func: str,
        column: str,
        cat_column: str | None = None,
        levels_ms: tuple[int, ...] = (1_000, 60_000, 3_600_000),
    ) -> None:
        if func not in DECOMPOSABLE:
            raise ValueError(
                f"{func!r} is not decomposable — pre-aggregation ineligible"
            )
        if list(levels_ms) != sorted(set(levels_ms)):
            raise ValueError("levels_ms must be strictly increasing")
        self.table = table
        self.func = func
        self.column = column
        self.cat_column = cat_column
        self.levels_ms = tuple(levels_ms)
        self.stats = [LevelStats(g) for g in levels_ms]
        #: level index -> {key -> {bucket_start -> state}}
        self._buckets: list[dict[Any, dict[int, Any]]] = [dict() for _ in levels_ms]
        #: key -> (min_ts, max_ts) of applied entries; queries clamp to this
        #: span so an unbounded range never enumerates empty buckets.
        self._key_range: dict[Any, tuple[int, int]] = {}
        self.last_offset = 0

    # -- aggregator update (binlog-driven) ------------------------------------

    def catch_up(self) -> int:
        """Apply binlog entries beyond ``last_offset``; returns #applied.

        Each entry's application is the paper's ``update_aggr`` closure:
        all levels for one entry update together, then the offset
        advances, so a crash between entries never half-applies one.
        """
        applied = 0
        for entry in self.table.binlog[self.last_offset :]:
            assert entry.offset == self.last_offset + 1, "binlog offsets must be monotone"
            value = entry.row[self.column]
            cat = entry.row[self.cat_column] if self.cat_column else None
            for lvl, gran in enumerate(self.levels_ms):
                start = (entry.ts // gran) * gran
                per_key = self._buckets[lvl].setdefault(entry.key, {})
                state = partial_state(
                    self.func,
                    np.asarray([value]),
                    np.asarray([cat]) if cat is not None else None,
                )
                if start in per_key:
                    per_key[start] = merge_states(self.func, per_key[start], state)
                else:
                    per_key[start] = state
            rng = self._key_range.get(entry.key)
            self._key_range[entry.key] = (
                (entry.ts, entry.ts)
                if rng is None
                else (min(rng[0], entry.ts), max(rng[1], entry.ts))
            )
            self.last_offset = entry.offset
            applied += 1
        return applied

    # -- query refinement -----------------------------------------------------

    def _cover(self, lo: int, hi: int) -> list[tuple[int, int]]:
        """Decompose the finest-aligned span [lo, hi) into (level, start)
        buckets, coarsest in the middle, ordered left→right."""
        out: list[tuple[int, int]] = []

        def rec(a: int, b: int, max_level: int) -> None:
            if a >= b:
                return
            for lvl in range(max_level, -1, -1):
                g = self.levels_ms[lvl]
                first = ((a + g - 1) // g) * g
                last = (b // g) * g
                if first < last:
                    rec(a, first, lvl - 1)
                    out.extend((lvl, s) for s in range(first, last, g))
                    rec(last, b, lvl - 1)
                    return
            raise AssertionError("finest level must align")

        rec(lo, hi, len(self.levels_ms) - 1)
        return out

    def query(self, key: Any, ts_lo: int, ts_hi: int) -> Any:
        """Merged partial state over rows of ``key`` with ts in [ts_lo, ts_hi].

        Raw-data edges come from the memtable; interior spans come from the
        bucket hierarchy. Returns None-state when the range is empty.
        """

        def _empty():
            return partial_state(
                self.func, np.asarray([]), np.asarray([]) if self.cat_column else None
            )

        # Clamp to the key's data span — outside it every bucket is empty,
        # and an unbounded request must not enumerate them.
        rng = self._key_range.get(key)
        if rng is None:
            return _empty()
        ts_lo = max(ts_lo, rng[0])
        ts_hi = min(ts_hi, rng[1])
        if ts_lo > ts_hi:
            return _empty()
        g0 = self.levels_ms[0]
        lo_aligned = ((ts_lo + g0 - 1) // g0) * g0
        hi_aligned = ((ts_hi + 1) // g0) * g0  # exclusive end of covered span
        pieces: list[Any] = []
        if lo_aligned >= hi_aligned:
            # Window narrower than one finest bucket: all raw.
            pieces.append(self._raw_state(key, ts_lo, ts_hi))
        else:
            if ts_lo < lo_aligned:
                pieces.append(self._raw_state(key, ts_lo, lo_aligned - 1))
            per_level = self._buckets
            key_buckets = [per_level[lvl].get(key, {}) for lvl in range(len(self.levels_ms))]
            for lvl, start in self._cover(lo_aligned, hi_aligned):
                state = key_buckets[lvl].get(start)
                self.stats[lvl].bucket_hits += 1
                if state is not None:
                    pieces.append(state)
            if hi_aligned <= ts_hi:
                pieces.append(self._raw_state(key, hi_aligned, ts_hi))
        merged: Any = None
        seen = False
        for p in pieces:
            if p is None:
                continue
            merged = p if not seen else merge_states(self.func, merged, p)
            seen = True
        return merged if seen else _empty()

    def query_value(self, key: Any, ts_lo: int, ts_hi: int, params: tuple = ()) -> Any:
        """Finalized aggregate over [ts_lo, ts_hi] (what the engine returns)."""
        return finalize_state(self.func, self.query(key, ts_lo, ts_hi), params)

    def _raw_state(self, key: Any, ts_lo: int, ts_hi: int) -> Any:
        rows = self.table.scan_window(key, ts_lo - 1, ts_hi)  # newest-first
        rows = rows[::-1]
        if not rows:
            return None
        vals = np.asarray([r[self.column] for r in rows])
        cats = (
            np.asarray([r[self.cat_column] for r in rows]) if self.cat_column else None
        )
        return partial_state(self.func, vals, cats)

    # -- adaptive hierarchy ---------------------------------------------------

    def suggest_levels(self, *, min_hit_fraction: float = 0.01) -> tuple[int, ...]:
        """Levels worth keeping given observed query traffic (Section 5.1's
        hierarchy adaptation): a level whose buckets served fewer than
        ``min_hit_fraction`` of all hits is a removal candidate."""
        total = sum(s.bucket_hits for s in self.stats) or 1
        return tuple(
            s.granularity_ms
            for s in self.stats
            if s.bucket_hits / total >= min_hit_fraction
        )

    def n_buckets(self) -> int:
        return sum(len(b) for lvl in self._buckets for b in lvl.values())
