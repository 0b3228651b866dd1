"""Unit tests for the two-layer time-series skiplist (Section 7.2)."""
import random

import pytest

from repro.storage.skiplist import TimeList, TimeSeriesSkipList


class TestTimeList:
    def test_insert_orders_newest_first(self):
        tl = TimeList()
        for ts in [5, 1, 9, 3]:
            tl.insert(ts, f"v{ts}")
        assert [ts for ts, _ in tl] == [9, 5, 3, 1]

    def test_equal_ts_keeps_insertion_order(self):
        tl = TimeList()
        tl.insert(5, "first")
        tl.insert(5, "second")
        # Oldest-first view preserves arrival order; newest-first iteration
        # therefore yields the later insert first.
        assert [v for _, v in reversed(list(tl))] == ["first", "second"]

    def test_scan_range_half_open(self):
        tl = TimeList()
        for ts in range(10):
            tl.insert(ts, ts)
        got = [ts for ts, _ in tl.scan_range(2, 6)]
        assert got == [6, 5, 4, 3]  # (2, 6], newest first

    def test_latest(self):
        tl = TimeList()
        for ts in [1, 4, 2]:
            tl.insert(ts, ts)
        assert [ts for ts, _ in tl.latest(2)] == [4, 2]

    def test_latest_before(self):
        tl = TimeList()
        for ts in [10, 20, 30]:
            tl.insert(ts, ts)
        assert tl.latest_before(25) == (20, 20)
        assert tl.latest_before(5) is None
        assert tl.latest_before(30) == (30, 30)

    def test_evict_before_batch_deletes_tail(self):
        tl = TimeList()
        for ts in range(10):
            tl.insert(ts, ts)
        removed = tl.evict_before(4)
        assert removed == 4
        assert [ts for ts, _ in tl] == [9, 8, 7, 6, 5, 4]
        assert tl.size == 6

    def test_evict_everything(self):
        tl = TimeList()
        tl.insert(1, "a")
        assert tl.evict_before(100) == 1
        assert list(tl) == [] and tl.size == 0

    def test_out_of_order_insert_seeks_correct_slot(self):
        tl = TimeList()
        for ts in [10, 30, 20, 5]:
            tl.insert(ts, ts)
        assert [ts for ts, _ in tl] == [30, 20, 10, 5]


class TestSkipList:
    def test_put_get(self):
        sl = TimeSeriesSkipList()
        sl.put("k1", 10, {"v": 1})
        sl.put("k1", 20, {"v": 2})
        sl.put("k2", 15, {"v": 3})
        assert [ts for ts, _ in sl.get("k1")] == [20, 10]
        assert sl.get("missing") is None
        assert sl.n_keys == 2 and sl.n_entries == 3

    def test_keys_sorted(self):
        sl = TimeSeriesSkipList()
        for k in [5, 1, 9, 3, 7]:
            sl.put(k, 0, None)
        assert list(sl.keys()) == [1, 3, 5, 7, 9]

    def test_many_keys_sorted(self):
        sl = TimeSeriesSkipList(seed=42)
        rng = random.Random(7)
        keys = rng.sample(range(100_000), 2_000)
        for k in keys:
            sl.put(k, k % 97, k)
        assert list(sl.keys()) == sorted(keys)

    def test_evict_before_across_keys(self):
        sl = TimeSeriesSkipList()
        for k in range(5):
            for ts in range(10):
                sl.put(k, ts, ts)
        removed = sl.evict_before(5)
        assert removed == 5 * 5
        assert sl.n_entries == 25
        for k, tl in sl.items():
            assert all(ts >= 5 for ts, _ in tl)

    def test_string_keys(self):
        sl = TimeSeriesSkipList()
        for k in ["pear", "apple", "mango"]:
            sl.put(k, 1, k)
        assert list(sl.keys()) == ["apple", "mango", "pear"]

    @pytest.mark.parametrize("seed", [0, 1, 2, 3])
    def test_deterministic_structure_random_ops(self, seed):
        sl = TimeSeriesSkipList(seed=seed)
        rng = random.Random(seed)
        expected: dict[int, list[int]] = {}
        for _ in range(3_000):
            k, ts = rng.randrange(50), rng.randrange(1_000)
            sl.put(k, ts, ts)
            expected.setdefault(k, []).append(ts)
        for k, tss in expected.items():
            got = [ts for ts, _ in sl.get(k)]
            assert got == sorted(tss, reverse=True)
