"""Unit tests for the online memtable store (Sections 7.2, 8.2)."""
import pandas as pd
import pytest

from repro.online.memtable import MemoryLimitExceeded, MemTable, MemTableStore


def _row(uid, ts, **kw):
    return {"userid": uid, "ts": ts, **kw}


class TestMemTable:
    def _table(self, **kw) -> MemTable:
        return MemTable("t", key_col="userid", ts_col="ts", **kw)

    def test_put_and_scan_window(self):
        t = self._table()
        for ts in [100, 200, 300, 400]:
            t.put(_row(1, ts, v=ts))
        got = t.scan_window(1, 150, 350)
        assert [r["ts"] for r in got] == [300, 200]

    def test_scan_unknown_key_empty(self):
        assert self._table().scan_window(42, 0, 100) == []

    def test_latest(self):
        t = self._table()
        for ts in [5, 15, 10]:
            t.put(_row(1, ts))
        assert [r["ts"] for r in t.latest(1, 2)] == [15, 10]

    def test_latest_before(self):
        t = self._table()
        for ts in [10, 20, 30]:
            t.put(_row(7, ts, v=ts))
        assert t.latest_before(7, 25)["v"] == 20
        assert t.latest_before(7, 9) is None
        assert t.latest_before(99, 50) is None

    def test_binlog_offsets_monotone(self):
        t = self._table()
        for ts in range(5):
            t.put(_row(1, ts))
        assert [e.offset for e in t.binlog] == [1, 2, 3, 4, 5]

    def test_subscribe_sees_every_insert(self):
        t = self._table()
        seen = []
        t.subscribe(lambda e: seen.append(e.offset))
        for ts in range(3):
            t.put(_row(1, ts))
        assert seen == [1, 2, 3]

    def test_ttl_eviction(self):
        t = self._table(ttl_ms=100)
        for ts in [0, 50, 100, 150]:
            t.put(_row(1, ts))
        removed = t.evict_expired(now_ts=180)
        assert removed == 2  # ts 0 and 50 are older than 180-100
        assert [r["ts"] for r in t.scan_window(1, -1, 10_000)] == [150, 100]

    def test_memory_limit_blocks_writes_keeps_reads(self):
        t = self._table(max_memory_mb=0.001, avg_row_bytes=200)
        t.put(_row(1, 1))
        with pytest.raises(MemoryLimitExceeded):
            for ts in range(2, 100):
                t.put(_row(1, ts))
        # Reads still work after the write failure (Section 8.2).
        assert len(t.scan_window(1, -1, 10_000)) == t.n_rows > 0

    def test_alert_fires_once_before_limit(self):
        alerts = []
        t = self._table(
            max_memory_mb=0.01,
            avg_row_bytes=200,
            alert_threshold=0.5,
            on_alert=lambda name, usage: alerts.append((name, usage)),
        )
        with pytest.raises(MemoryLimitExceeded):
            for ts in range(1_000):
                t.put(_row(1, ts))
        assert len(alerts) == 1
        assert alerts[0][0] == "t"

    def test_estimated_bytes_grows(self):
        t = self._table()
        before = t.estimated_bytes()
        t.put(_row(1, 1))
        assert t.estimated_bytes() > before


class TestStore:
    def test_create_and_get(self):
        s = MemTableStore()
        s.create_table("a", key_col="userid", ts_col="ts")
        assert s["a"].name == "a"

    def test_duplicate_rejected(self):
        s = MemTableStore()
        s.create_table("a", key_col="userid", ts_col="ts")
        with pytest.raises(ValueError):
            s.create_table("a", key_col="userid", ts_col="ts")

    def test_load_pandas(self):
        s = MemTableStore()
        pdf = pd.DataFrame({"userid": [1, 1, 2], "ts": [10, 20, 15], "v": [1.0, 2.0, 3.0]})
        t = s.load_pandas("ev", pdf, key_col="userid", ts_col="ts")
        assert t.n_rows == 3
        assert t.latest_before(1, 25)["v"] == 2.0
