"""Tests for long-window pre-aggregation (Section 5.1): the aggregator
hierarchy must answer exactly like a raw scan, at bucket cost."""
import numpy as np
import pandas as pd
import pytest

from repro.core.kernels import finalize_state, partial_state
from repro.online.memtable import MemTableStore
from repro.online.preagg import MultiLevelAggregator
from repro.synth_data import STREAM_T0_MS, events_pdf


def _loaded_table(n=2_000, n_users=5, span_ms=2_000_000, seed=0):
    store = MemTableStore()
    pdf = events_pdf(n=n, n_users=n_users, span_ms=span_ms, seed=seed)
    table = store.load_pandas("events", pdf, key_col="userid", ts_col="ts")
    return table, pdf


def _raw_value(pdf, func, key, lo, hi, column="price", cat=None, params=()):
    sub = pdf[(pdf["userid"] == key) & (pdf["ts"] >= lo) & (pdf["ts"] <= hi)].sort_values("ts")
    state = partial_state(
        func,
        sub[column].to_numpy(),
        sub[cat].to_numpy() if cat else None,
    )
    return finalize_state(func, state, params)


class TestCatchUp:
    def test_catch_up_applies_all_entries(self):
        table, pdf = _loaded_table(n=500)
        agg = MultiLevelAggregator(table, func="sum", column="price")
        assert agg.catch_up() == 500
        assert agg.last_offset == 500

    def test_catch_up_is_incremental(self):
        table, pdf = _loaded_table(n=100)
        agg = MultiLevelAggregator(table, func="sum", column="price")
        agg.catch_up()
        table.put({"userid": 1, "ts": int(pdf["ts"].max()) + 10, "price": 5.0,
                   "quantity": 1, "category": "x", "etype": "buy"})
        assert agg.catch_up() == 1
        assert agg.catch_up() == 0

    def test_recovery_resumes_from_offset(self):
        table, pdf = _loaded_table(n=300)
        agg = MultiLevelAggregator(table, func="count", column="price")
        agg.catch_up()
        saved_offset = agg.last_offset
        # "Crash": a new aggregator resumes from a checkpointed offset by
        # replaying the binlog suffix only.
        agg2 = MultiLevelAggregator(table, func="count", column="price")
        agg2.catch_up()
        assert agg2.last_offset == saved_offset
        key = int(pdf["userid"].iloc[0])
        lo, hi = int(pdf["ts"].min()), int(pdf["ts"].max())
        assert agg.query_value(key, lo, hi) == agg2.query_value(key, lo, hi)

    def test_nondecomposable_rejected(self):
        table, _ = _loaded_table(n=10)
        with pytest.raises(ValueError):
            MultiLevelAggregator(table, func="ew_avg", column="price")

    def test_bad_levels_rejected(self):
        table, _ = _loaded_table(n=10)
        with pytest.raises(ValueError):
            MultiLevelAggregator(table, func="sum", column="price", levels_ms=(60_000, 1_000))


@pytest.mark.parametrize("func,column,cat,params", [
    ("sum", "price", None, ()),
    ("count", "price", None, ()),
    ("min", "price", None, ()),
    ("max", "price", None, ()),
    ("avg", "price", None, ()),
    ("distinct_count", "etype", None, ()),
    ("topn_frequency", "category", None, (3,)),
    ("drawdown", "price", None, ()),
    ("avg_cate", "price", "category", ()),
])
class TestQueryEqualsRawScan:
    def test_random_windows(self, func, column, cat, params):
        table, pdf = _loaded_table(n=1_500, n_users=4, span_ms=5_000_000)
        agg = MultiLevelAggregator(
            table, func=func, column=column, cat_column=cat, levels_ms=(1_000, 60_000, 600_000)
        )
        agg.catch_up()
        rng = np.random.default_rng(7)
        t0, t1 = int(pdf["ts"].min()), int(pdf["ts"].max())
        for _ in range(15):
            key = int(rng.integers(1, 5))
            lo = int(rng.integers(t0 - 1_000, t1))
            hi = lo + int(rng.integers(1, t1 - t0 + 100_000))
            got = agg.query_value(key, lo, hi, params)
            want = _raw_value(pdf, func, key, lo, hi, column=column, cat=cat, params=params)
            if isinstance(want, float) and want is not None:
                assert got == pytest.approx(want, rel=1e-9), (key, lo, hi)
            else:
                assert got == want, (key, lo, hi)


class TestQueryEdges:
    def test_window_narrower_than_finest_bucket(self):
        table, pdf = _loaded_table(n=1_000, span_ms=100_000)
        agg = MultiLevelAggregator(table, func="count", column="price", levels_ms=(60_000,))
        agg.catch_up()
        key = int(pdf["userid"].iloc[0])
        ts = int(pdf[pdf["userid"] == key]["ts"].iloc[5])
        got = agg.query_value(key, ts - 10, ts + 10)
        want = _raw_value(pdf, "count", key, ts - 10, ts + 10)
        assert got == want

    def test_empty_range(self):
        table, _ = _loaded_table(n=50)
        agg = MultiLevelAggregator(table, func="sum", column="price")
        agg.catch_up()
        assert agg.query_value(1, 0, 10) == 0.0

    def test_unknown_key(self):
        table, _ = _loaded_table(n=50)
        agg = MultiLevelAggregator(table, func="count", column="price")
        agg.catch_up()
        assert agg.query_value(999, 0, 10**18) == 0

    def test_exact_bucket_boundaries(self):
        table, pdf = _loaded_table(n=800, span_ms=900_000)
        agg = MultiLevelAggregator(table, func="sum", column="price", levels_ms=(1_000, 60_000))
        agg.catch_up()
        lo = (STREAM_T0_MS // 60_000) * 60_000
        hi = lo + 5 * 60_000 - 1
        for key in range(1, 5):
            assert agg.query_value(key, lo, hi) == pytest.approx(
                _raw_value(pdf, "sum", key, lo, hi), rel=1e-9
            )


class TestHierarchy:
    def test_bucket_count_bounded_by_rows_times_levels(self):
        table, _ = _loaded_table(n=400)
        agg = MultiLevelAggregator(table, func="sum", column="price", levels_ms=(1_000, 60_000))
        agg.catch_up()
        assert 0 < agg.n_buckets() <= 2 * 400

    def test_coarse_buckets_serve_long_windows(self):
        table, pdf = _loaded_table(n=2_000, span_ms=50_000_000)
        agg = MultiLevelAggregator(
            table, func="sum", column="price", levels_ms=(1_000, 60_000, 3_600_000)
        )
        agg.catch_up()
        t0, t1 = int(pdf["ts"].min()), int(pdf["ts"].max())
        agg.query_value(1, t0, t1)
        hits = {s.granularity_ms: s.bucket_hits for s in agg.stats}
        assert hits[3_600_000] > 0  # the hour level did real work

    def test_suggest_levels_drops_unused(self):
        table, pdf = _loaded_table(n=500, span_ms=120_000)
        agg = MultiLevelAggregator(
            table, func="sum", column="price", levels_ms=(1_000, 3_600_000 * 24)
        )
        agg.catch_up()
        t0 = int(pdf["ts"].min())
        for off in range(0, 50_000, 5_000):  # short windows only
            agg.query_value(1, t0 + off, t0 + off + 20_000)
        kept = agg.suggest_levels()
        assert 1_000 in kept
        assert 3_600_000 * 24 not in kept
