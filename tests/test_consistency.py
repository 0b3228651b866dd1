"""The paper's headline claim (Section 4): the unified plan's offline
(Spark batch) execution and online (request-mode replay) execution
produce identical features — no offline/online drift."""
import numpy as np
import pandas as pd
import pytest

from repro.core.plan import clear_cache, compile_script
from repro.core.spec import AggSpec, Condition, FeatureScript, LastJoinSpec, WindowSpec
from repro.online.engine import LongWindowConfig, OnlineEngine, replay_consistency
from repro.online.memtable import MemTableStore
from repro.synth_data import events_pdf, orders_stream_pdf


def _compare(offline_pdf: pd.DataFrame, online_pdf: pd.DataFrame, features: list[str]):
    offline_pdf = offline_pdf.sort_values("ts").reset_index(drop=True)
    assert len(offline_pdf) == len(online_pdf)
    for col in features:
        off, on = offline_pdf[col], online_pdf[col]
        if off.dtype.kind == "f":
            np.testing.assert_allclose(
                off.astype("float64"), on.astype("float64"), rtol=1e-9, err_msg=col
            )
        else:
            assert off.fillna("<null>").tolist() == on.fillna("<null>").tolist(), col


def _run_both(spark, script, ev, od=None, long_windows=()):
    clear_cache()
    tables = {"events": spark.createDataFrame(ev)}
    union_pdfs = {}
    if od is not None:
        tables["orders"] = spark.createDataFrame(od)
        union_pdfs["orders"] = od
    plan = compile_script(script)
    offline = plan.offline(tables).toPandas()

    store = MemTableStore()
    store.create_table("events", key_col="userid", ts_col="ts")
    if od is not None:
        store.create_table("orders", key_col="userid", ts_col="ts")
    engine = OnlineEngine(store, script, long_windows=tuple(long_windows))
    online = replay_consistency(engine, ev, union_pdfs)
    return offline, online


class TestOfflineOnlineConsistency:
    def test_standard_aggs_single_window(self, spark):
        ev = events_pdf(n=250, n_users=5, span_ms=80_000, seed=71)
        w = WindowSpec(name="w", partition_by="userid", order_by="ts", range_ms=12_000)
        script = FeatureScript(
            "events", "userid", "ts", (w,),
            (
                AggSpec("sum", "price", "w", "f_sum"),
                AggSpec("count", "price", "w", "f_cnt"),
                AggSpec("avg", "price", "w", "f_avg"),
                AggSpec("min", "price", "w", "f_min"),
                AggSpec("max", "price", "w", "f_max"),
            ),
        )
        off, on = _run_both(spark, script, ev)
        _compare(off, on, [a.out for a in script.aggs])

    def test_ml_aggs_and_conditions(self, spark):
        ev = events_pdf(n=200, n_users=4, span_ms=60_000, seed=72)
        w = WindowSpec(name="w", partition_by="userid", order_by="ts", range_ms=15_000)
        script = FeatureScript(
            "events", "userid", "ts", (w,),
            (
                AggSpec("distinct_count", "etype", "w", "f_dc"),
                AggSpec("topn_frequency", "category", "w", "f_top", params=(3,)),
                AggSpec("drawdown", "price", "w", "f_dd"),
                AggSpec("ew_avg", "price", "w", "f_ew", params=(0.4,)),
                AggSpec("avg_cate", "price", "w", "f_ac", params=("category",)),
                AggSpec("sum", "price", "w", "f_cond", where=Condition("quantity", ">", 2)),
            ),
        )
        off, on = _run_both(spark, script, ev)
        _compare(off, on, [a.out for a in script.aggs])

    def test_multi_window_with_rows_frame(self, spark):
        ev = events_pdf(n=220, n_users=4, span_ms=70_000, seed=73)
        w1 = WindowSpec(name="w1", partition_by="userid", order_by="ts", range_ms=10_000)
        w2 = WindowSpec(name="w2", partition_by="userid", order_by="ts", rows=7)
        w3 = WindowSpec(name="w3", partition_by="category", order_by="ts", range_ms=5_000)
        script = FeatureScript(
            "events", "userid", "ts", (w1, w2, w3),
            (
                AggSpec("sum", "price", "w1", "f1"),
                AggSpec("avg", "price", "w2", "f2"),
                AggSpec("count", "price", "w3", "f3"),
            ),
        )
        off, on = _run_both(spark, script, ev)
        _compare(off, on, ["f1", "f2", "f3"])

    def test_window_union_and_last_join(self, spark):
        ev = events_pdf(n=180, n_users=4, span_ms=50_000, seed=74)
        od = orders_stream_pdf(n=90, n_users=4, span_ms=50_000, seed=75)
        w = WindowSpec(
            name="w_union", partition_by="userid", order_by="ts",
            range_ms=9_000, union_tables=("orders",),
        )
        script = FeatureScript(
            "events", "userid", "ts", (w,),
            (
                AggSpec("sum", "price", "w_union", "f_s"),
                AggSpec("count", "price", "w_union", "f_c"),
                AggSpec("topn_frequency", "category", "w_union", "f_t", params=(2,)),
            ),
            (LastJoinSpec("orders", "userid", "ts", ("price", "quantity")),),
        )
        off, on = _run_both(spark, script, ev, od=od)
        _compare(off, on, ["f_s", "f_c", "f_t", "orders_price", "orders_quantity"])

    def test_consistency_holds_with_preagg_enabled(self, spark):
        """The pre-aggregated online path must agree with offline too —
        the optimization cannot break the consistency contract."""
        ev = events_pdf(n=300, n_users=3, span_ms=400_000, seed=76)
        w = WindowSpec(name="lw", partition_by="userid", order_by="ts", range_ms=100_000)
        script = FeatureScript(
            "events", "userid", "ts", (w,),
            (
                AggSpec("sum", "price", "lw", "f_s"),
                AggSpec("max", "price", "lw", "f_m"),
                AggSpec("drawdown", "price", "lw", "f_d"),
            ),
        )
        off, on = _run_both(
            spark, script, ev,
            long_windows=(LongWindowConfig("lw", levels_ms=(1_000, 60_000)),),
        )
        _compare(off, on, ["f_s", "f_m", "f_d"])

    def test_merged_windows_still_consistent(self, spark):
        """Two windows with identical templates merge into one physical
        window (Section 4.2) — results must be unchanged."""
        ev = events_pdf(n=150, n_users=3, span_ms=40_000, seed=77)
        w1 = WindowSpec(name="wa", partition_by="userid", order_by="ts", range_ms=6_000)
        w2 = WindowSpec(name="wb", partition_by="userid", order_by="ts", range_ms=6_000)
        script = FeatureScript(
            "events", "userid", "ts", (w1, w2),
            (AggSpec("sum", "price", "wa", "fa"), AggSpec("count", "price", "wb", "fb")),
        )
        clear_cache()
        assert compile_script(script).n_physical_windows == 1
        off, on = _run_both(spark, script, ev)
        _compare(off, on, ["fa", "fb"])
