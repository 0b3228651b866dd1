"""Online in-memory table store backing the real-time engine.

Each :class:`MemTable` holds one stream table: rows (dicts) indexed by a
key column through the two-layer :class:`TimeSeriesSkipList`, ordered by a
timestamp column. Every insert appends to a monotonically increasing
*binlog* (paper Section 5.1's ``binlog_offset``), which pre-aggregators
consume asynchronously.

Runtime memory management (paper Section 8.2) is reproduced at table
level: when estimated usage exceeds ``max_memory_mb``, writes raise
:class:`MemoryLimitExceeded` while reads keep working, and an alert
callback fires once usage passes the alert threshold.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Any, Callable, Iterator

from repro.storage.skiplist import TimeSeriesSkipList

#: Section 8.1 constants reused for the runtime usage estimate.
_ROW_NODE_C = 70
_PK_NODE = 156


class MemoryLimitExceeded(RuntimeError):
    """Raised on writes once a table passes its ``max_memory_mb`` limit."""


@dataclass
class BinlogEntry:
    offset: int
    key: Any
    ts: int
    row: dict


class MemTable:
    """One online stream table: key-indexed, time-ordered, TTL-evicted."""

    def __init__(
        self,
        name: str,
        *,
        key_col: str,
        ts_col: str,
        ttl_ms: int | None = None,
        max_memory_mb: float | None = None,
        avg_row_bytes: float = 64.0,
        alert_threshold: float = 0.8,
        on_alert: Callable[[str, float], None] | None = None,
    ) -> None:
        self.name = name
        self.key_col = key_col
        self.ts_col = ts_col
        self.ttl_ms = ttl_ms
        self.max_memory_mb = max_memory_mb
        self.avg_row_bytes = avg_row_bytes
        self.alert_threshold = alert_threshold
        self.on_alert = on_alert
        self._alerted = False
        #: one two-layer skiplist per indexed column (paper Section 7.3:
        #: "assign multiple indexes when creating tables for columns
        #: frequently used in order-by and partition-by").
        self.indexes: dict[str, TimeSeriesSkipList] = {key_col: TimeSeriesSkipList()}
        self.binlog: list[BinlogEntry] = []
        self._listeners: list[Callable[[BinlogEntry], None]] = []

    @property
    def index(self) -> TimeSeriesSkipList:
        """The primary (key_col) index."""
        return self.indexes[self.key_col]

    def ensure_index(self, col: str) -> None:
        """Create a secondary index on ``col``, backfilled from the binlog.

        Deploying a script whose window partitions by a non-primary column
        triggers this (the paper's index optimization at compile time).
        """
        if col in self.indexes:
            return
        idx = TimeSeriesSkipList()
        for entry in self.binlog:
            idx.put(entry.row[col], entry.ts, entry.row)
        self.indexes[col] = idx

    # -- writes ---------------------------------------------------------------

    def put(self, row: dict) -> BinlogEntry:
        """Insert one row; appends a binlog entry and notifies listeners.

        The binlog offset increases monotonically under the (GIL-provided)
        replicator lock, the invariant Section 5.1's aggregator updates
        assume.
        """
        usage = self.estimated_bytes()
        if self.max_memory_mb is not None:
            limit = self.max_memory_mb * 1_000_000
            if (
                not self._alerted
                and self.on_alert is not None
                and usage >= self.alert_threshold * limit
            ):
                self._alerted = True
                self.on_alert(self.name, usage)
            if usage + self.avg_row_bytes > limit:
                raise MemoryLimitExceeded(
                    f"table {self.name!r}: {usage:.0f}B ≥ {limit:.0f}B — "
                    "writes fail, reads continue"
                )
        key, ts = row[self.key_col], int(row[self.ts_col])
        for col, idx in self.indexes.items():
            idx.put(row[col], ts, row)
        entry = BinlogEntry(offset=len(self.binlog) + 1, key=key, ts=ts, row=row)
        self.binlog.append(entry)
        for listener in self._listeners:
            listener(entry)
        return entry

    def put_many(self, rows: Iterator[dict] | list[dict]) -> None:
        for r in rows:
            self.put(r)

    def subscribe(self, listener: Callable[[BinlogEntry], None]) -> None:
        """Register a binlog consumer (pre-aggregators use this)."""
        self._listeners.append(listener)

    # -- reads ----------------------------------------------------------------

    def scan_window(
        self, key: Any, ts_lo: int, ts_hi: int, *, index_col: str | None = None
    ) -> list[dict]:
        """Rows for ``key`` with ts in (ts_lo, ts_hi], newest first.

        ``index_col`` selects a secondary index (default: primary key).
        """
        times = self.indexes[index_col or self.key_col].get(key)
        if times is None:
            return []
        return [row for _, row in times.scan_range(ts_lo, ts_hi)]

    def latest(self, key: Any, n: int = 1, *, index_col: str | None = None) -> list[dict]:
        times = self.indexes[index_col or self.key_col].get(key)
        return [row for _, row in times.latest(n)] if times is not None else []

    def latest_before(self, key: Any, ts_hi: int, *, index_col: str | None = None) -> dict | None:
        """Most recent row for ``key`` at or before ``ts_hi`` (LAST JOIN)."""
        times = self.indexes[index_col or self.key_col].get(key)
        if times is None:
            return None
        hit = times.latest_before(ts_hi)
        return hit[1] if hit is not None else None

    def full_scan(self) -> Iterator[dict]:
        """Unindexed scan of every row (the baseline engines use this)."""
        for _, times in self.index.items():
            for _, row in times:
                yield row

    # -- maintenance ----------------------------------------------------------

    def evict_expired(self, now_ts: int) -> int:
        if self.ttl_ms is None:
            return 0
        removed = 0
        for idx in self.indexes.values():
            removed += idx.evict_before(now_ts - self.ttl_ms)
        return removed // len(self.indexes) if self.indexes else 0

    def estimated_bytes(self) -> float:
        node_bytes = sum(
            idx.n_keys * (8 + _PK_NODE) + idx.n_entries * _ROW_NODE_C
            for idx in self.indexes.values()
        )
        return node_bytes + self.index.n_entries * self.avg_row_bytes

    @property
    def n_rows(self) -> int:
        return self.index.n_entries


class MemTableStore:
    """Named collection of :class:`MemTable` — the online engine's catalog."""

    def __init__(self) -> None:
        self.tables: dict[str, MemTable] = {}

    def create_table(self, name: str, **kw) -> MemTable:
        if name in self.tables:
            raise ValueError(f"table {name!r} already exists")
        t = MemTable(name, **kw)
        self.tables[name] = t
        return t

    def __getitem__(self, name: str) -> MemTable:
        return self.tables[name]

    def load_pandas(self, name: str, pdf, *, key_col: str, ts_col: str, **kw) -> MemTable:
        """Create a table and bulk-load a pandas frame (row order preserved)."""
        t = self.create_table(name, key_col=key_col, ts_col=ts_col, **kw)
        t.put_many(pdf.to_dict("records"))
        return t
