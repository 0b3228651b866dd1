"""Tests for the RocksDB-style on-disk store (Section 7.3)."""
import pytest

from repro.storage.ondisk import ColumnFamily, DiskTable


def _table(tmp_path, ttl_ms=None):
    return DiskTable(
        str(tmp_path),
        ts_col="ts",
        families=[
            ColumnFamily("by_user", key_col="userid", ttl_ms=ttl_ms),
            ColumnFamily("by_item", key_col="itemid", ttl_ms=None),
        ],
    )


def _row(uid, item, ts):
    return {"userid": uid, "itemid": item, "ts": ts, "price": float(ts)}


class TestDiskTable:
    def test_memtable_scan_before_flush(self, tmp_path):
        t = _table(tmp_path)
        for ts in [10, 20, 30]:
            t.put(_row(1, 100, ts))
        got = t.scan("by_user", 1, 5, 25)
        assert [r["ts"] for r in got] == [20, 10]

    def test_scan_merges_memtable_and_runs(self, tmp_path):
        t = _table(tmp_path)
        for ts in [10, 20]:
            t.put(_row(1, 100, ts))
        t.flush()
        for ts in [30, 40]:
            t.put(_row(1, 100, ts))
        got = t.scan("by_user", 1, -1, 100)
        assert [r["ts"] for r in got] == [40, 30, 20, 10]

    def test_multiple_runs_sorted_merge(self, tmp_path):
        t = _table(tmp_path)
        t.put(_row(1, 100, 5))
        t.flush()
        t.put(_row(1, 100, 15))
        t.flush()
        t.put(_row(1, 100, 10))
        got = t.scan("by_user", 1, -1, 100)
        assert [r["ts"] for r in got] == [15, 10, 5]

    def test_column_families_index_same_rows_differently(self, tmp_path):
        t = _table(tmp_path)
        t.put(_row(1, 100, 10))
        t.put(_row(2, 100, 20))
        t.flush()
        assert len(t.scan("by_user", 1, -1, 100)) == 1
        assert len(t.scan("by_item", 100, -1, 100)) == 2

    def test_latest_before(self, tmp_path):
        t = _table(tmp_path)
        for ts in [10, 20, 30]:
            t.put(_row(1, 100, ts))
        t.flush()
        assert t.latest_before("by_user", 1, 25)["ts"] == 20
        assert t.latest_before("by_user", 1, 5) is None

    def test_eviction_per_family_policy(self, tmp_path):
        t = _table(tmp_path, ttl_ms=50)
        for ts in [10, 40, 80, 100]:
            t.put(_row(1, 100, ts))
        t.flush()
        dropped = t.evict(now_ts=120)
        # by_user TTL 50 drops ts 10 and 40; by_item has no TTL.
        assert dropped == 2
        assert t.n_rows("by_user") == 2
        assert t.n_rows("by_item") == 4

    def test_eviction_spans_memtable_and_disk(self, tmp_path):
        t = _table(tmp_path, ttl_ms=50)
        t.put(_row(1, 100, 10))
        t.flush()
        t.put(_row(1, 100, 20))
        assert t.evict(now_ts=120) == 2
        assert t.n_rows("by_user") == 0

    def test_flush_empties_memtable_only_once(self, tmp_path):
        t = _table(tmp_path)
        t.put(_row(1, 100, 10))
        t.flush()
        t.flush()  # no rows — must not create an empty run
        assert t.n_rows("by_user") == 1

    def test_run_files_on_disk(self, tmp_path):
        t = _table(tmp_path)
        t.put(_row(1, 100, 10))
        t.flush()
        assert len(t._runs("by_user")) == 1
        assert len(t._runs("by_item")) == 1
