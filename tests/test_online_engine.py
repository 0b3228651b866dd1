"""Online request-mode engine tests (Sections 3.2, 5): request results vs
the independent brute-force reference, pre-agg path vs raw path."""
import numpy as np
import pandas as pd
import pytest

from repro.core.plan import clear_cache
from repro.core.spec import AggSpec, Condition, FeatureScript, LastJoinSpec, WindowSpec
from repro.online.engine import LongWindowConfig, OnlineEngine, replay_consistency
from repro.online.memtable import MemTableStore
from repro.synth_data import events_pdf, orders_stream_pdf
from tests.util import brute_force_features


def _store(ev, od=None):
    store = MemTableStore()
    store.create_table("events", key_col="userid", ts_col="ts")
    if od is not None:
        store.create_table("orders", key_col="userid", ts_col="ts")
    return store


def _basic_script(range_ms=20_000, unions=(), aggs=None, joins=()):
    w = WindowSpec(name="w", partition_by="userid", order_by="ts", range_ms=range_ms, union_tables=unions)
    return FeatureScript(
        base_table="events", key_col="userid", ts_col="ts",
        windows=(w,),
        aggs=tuple(aggs or (AggSpec("sum", "price", "w", "s"), AggSpec("count", "price", "w", "c"))),
        last_joins=tuple(joins),
    )


class TestRequestMode:
    def test_request_includes_virtual_insert(self):
        store = _store(None)
        engine = OnlineEngine(store, _basic_script())
        # Empty store: the window contains only the request row itself.
        feats = engine.process_request({"userid": 1, "ts": 1_000, "price": 7.0})
        assert feats == {"s": 7.0, "c": 1}

    def test_window_sees_only_stored_history(self):
        store = _store(None)
        engine = OnlineEngine(store, _basic_script(range_ms=100))
        engine.insert("events", {"userid": 1, "ts": 900, "price": 1.0})
        engine.insert("events", {"userid": 1, "ts": 950, "price": 2.0})
        engine.insert("events", {"userid": 1, "ts": 500, "price": 100.0})  # outside range
        feats = engine.process_request({"userid": 1, "ts": 1_000, "price": 7.0})
        assert feats["s"] == pytest.approx(10.0)
        assert feats["c"] == 3

    def test_other_keys_invisible(self):
        store = _store(None)
        engine = OnlineEngine(store, _basic_script())
        engine.insert("events", {"userid": 2, "ts": 990, "price": 50.0})
        feats = engine.process_request({"userid": 1, "ts": 1_000, "price": 7.0})
        assert feats["s"] == 7.0

    def test_rows_window(self):
        w = WindowSpec(name="w", partition_by="userid", order_by="ts", rows=2)
        script = FeatureScript("events", "userid", "ts", (w,), (AggSpec("sum", "price", "w", "s"),))
        engine = OnlineEngine(_store(None), script)
        for ts, p in [(10, 1.0), (20, 2.0), (30, 4.0)]:
            engine.insert("events", {"userid": 1, "ts": ts, "price": p})
        feats = engine.process_request({"userid": 1, "ts": 40, "price": 8.0})
        assert feats["s"] == pytest.approx(4.0 + 8.0)  # latest 2 rows incl. request

    def test_last_join_feature(self):
        store = _store(None, od=True)
        script = _basic_script(joins=(LastJoinSpec("orders", "userid", "ts", ("price",)),))
        engine = OnlineEngine(store, script)
        engine.insert("orders", {"userid": 1, "ts": 500, "price": 3.5})
        engine.insert("orders", {"userid": 1, "ts": 800, "price": 9.5})
        feats = engine.process_request({"userid": 1, "ts": 1_000, "price": 1.0})
        assert feats["orders_price"] == 9.5

    def test_last_join_no_match_is_null(self):
        store = _store(None, od=True)
        script = _basic_script(joins=(LastJoinSpec("orders", "userid", "ts", ("price",)),))
        engine = OnlineEngine(store, script)
        feats = engine.process_request({"userid": 1, "ts": 1_000, "price": 1.0})
        assert feats["orders_price"] is None


class TestReplayAgainstBruteForce:
    def test_replay_matches_reference(self):
        clear_cache()
        ev = events_pdf(n=120, n_users=4, span_ms=40_000, seed=61)
        od = orders_stream_pdf(n=60, n_users=4, span_ms=40_000, seed=62)
        script = _basic_script(
            range_ms=8_000,
            unions=("orders",),
            aggs=(
                AggSpec("sum", "price", "w", "s"),
                AggSpec("distinct_count", "etype", "w", "dc"),
                AggSpec("avg_cate", "price", "w", "ac", params=("category",), where=Condition("quantity", ">", 1)),
            ),
            joins=(LastJoinSpec("orders", "userid", "ts", ("price",)),),
        )
        engine = OnlineEngine(_store(ev, od=True), script)
        got = replay_consistency(engine, ev, {"orders": od})
        ref = brute_force_features(ev, {"orders": od}, script)
        for col in ["s", "dc", "ac", "orders_price"]:
            g = got[col]
            r = ref[col]
            if r.dtype.kind == "f":
                np.testing.assert_allclose(
                    g.astype("float64"), r.astype("float64"), rtol=1e-9
                )
            else:
                assert g.fillna("<null>").tolist() == r.fillna("<null>").tolist(), col


class TestPreAggPath:
    def _engine_pair(self, aggs, levels=(1_000, 60_000)):
        ev = events_pdf(n=400, n_users=3, span_ms=600_000, seed=63)
        script = _basic_script(range_ms=120_000, aggs=aggs)
        raw = OnlineEngine(_store(ev), script)
        pre = OnlineEngine(
            _store(ev), script, long_windows=(LongWindowConfig("w", levels_ms=levels),)
        )
        return ev, raw, pre

    @pytest.mark.parametrize(
        "agg",
        [
            AggSpec("sum", "price", "w", "o"),
            AggSpec("avg", "price", "w", "o"),
            AggSpec("min", "price", "w", "o"),
            AggSpec("max", "price", "w", "o"),
            AggSpec("distinct_count", "etype", "w", "o"),
            AggSpec("topn_frequency", "category", "w", "o", params=(2,)),
            AggSpec("drawdown", "price", "w", "o"),
            AggSpec("avg_cate", "price", "w", "o", params=("category",)),
        ],
        ids=["sum", "avg", "min", "max", "distinct", "topn", "drawdown", "avg_cate"],
    )
    def test_preagg_equals_raw_path(self, agg):
        clear_cache()
        ev, raw_engine, pre_engine = self._engine_pair((agg,))
        got_pre = replay_consistency(pre_engine, ev, {})
        clear_cache()
        got_raw = replay_consistency(raw_engine, ev, {}, use_preagg=False)
        a, b = got_pre["o"], got_raw["o"]
        if a.dtype.kind == "f":
            np.testing.assert_allclose(a, b, rtol=1e-9)
        else:
            assert a.tolist() == b.tolist()

    def test_ew_avg_rejected_for_preagg(self):
        ev = events_pdf(n=10, n_users=2, seed=64)
        script = _basic_script(aggs=(AggSpec("ew_avg", "price", "w", "o", params=(0.5,)),))
        with pytest.raises(ValueError):
            OnlineEngine(
                _store(ev), script, long_windows=(LongWindowConfig("w"),)
            )

    def test_union_window_rejected_for_preagg(self):
        script = _basic_script(unions=("orders",))
        with pytest.raises(ValueError):
            OnlineEngine(
                _store(None, od=True), script, long_windows=(LongWindowConfig("w"),)
            )

    def test_rows_window_rejected_for_preagg(self):
        w = WindowSpec(name="w", partition_by="userid", order_by="ts", rows=5)
        script = FeatureScript("events", "userid", "ts", (w,), (AggSpec("sum", "price", "w", "s"),))
        with pytest.raises(ValueError):
            OnlineEngine(_store(None), script, long_windows=(LongWindowConfig("w"),))
