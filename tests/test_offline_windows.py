"""Offline window executor tests: kernel executor vs Spark-native windows
vs the DuckDB oracle, single-table and WINDOW UNION."""
import pandas as pd
import pytest

from repro.core.spec import AggSpec, Condition, WindowSpec
from repro.offline.windows import (
    IDX_COL,
    add_index_column,
    compute_window_features,
    spark_native_window,
)
from repro.oracle import assert_equivalent
from repro.synth_data import events_pdf, orders_stream_pdf
from tests.util import brute_force_features
from repro.core.spec import FeatureScript

N = 400
N_USERS = 6
SPAN = 120_000


@pytest.fixture(scope="module")
def ev_pdf():
    return events_pdf(n=N, n_users=N_USERS, span_ms=SPAN, seed=21)


@pytest.fixture(scope="module")
def od_pdf():
    return orders_stream_pdf(n=N // 2, n_users=N_USERS, span_ms=SPAN, seed=22)


@pytest.fixture(scope="module")
def ev_idx(spark, ev_pdf):
    df = add_index_column(spark.createDataFrame(ev_pdf), "ts")
    df.persist().count()
    return df


def _range_window(range_ms=10_000, unions=()):
    return WindowSpec(
        name="w", partition_by="userid", order_by="ts", range_ms=range_ms, union_tables=unions
    )


def _rows_window(rows=5, unions=()):
    return WindowSpec(
        name="w", partition_by="userid", order_by="ts", rows=rows, union_tables=unions
    )


class TestIndexColumn:
    def test_index_unique_and_dense(self, ev_idx):
        pdf = ev_idx.select(IDX_COL).toPandas()
        got = sorted(pdf[IDX_COL].tolist())
        assert got == list(range(1, N + 1))

    def test_index_follows_time_order(self, ev_idx):
        pdf = ev_idx.select("ts", IDX_COL).toPandas().sort_values("ts")
        assert pdf[IDX_COL].is_monotonic_increasing


class TestAgainstSparkNative:
    @pytest.mark.parametrize("func", ["sum", "count", "avg", "min", "max"])
    def test_range_frame_matches_native(self, ev_idx, func):
        w = _range_window()
        aggs = [AggSpec(func, "price", "w", "out")]
        ours = compute_window_features(ev_idx, {}, w, aggs).toPandas()
        native = spark_native_window(ev_idx, w, aggs).toPandas()
        merged = ours.merge(native, on=IDX_COL, suffixes=("_k", "_n"))
        assert len(merged) == N
        pd.testing.assert_series_equal(
            merged["out_k"], merged["out_n"], check_names=False, rtol=1e-9
        )

    @pytest.mark.parametrize("rows", [1, 3, 10])
    def test_rows_frame_matches_native(self, ev_idx, rows):
        w = _rows_window(rows=rows)
        aggs = [AggSpec("sum", "price", "w", "out")]
        ours = compute_window_features(ev_idx, {}, w, aggs).toPandas()
        native = spark_native_window(ev_idx, w, aggs).toPandas()
        merged = ours.merge(native, on=IDX_COL, suffixes=("_k", "_n"))
        pd.testing.assert_series_equal(
            merged["out_k"], merged["out_n"], check_names=False, rtol=1e-9
        )


class TestAgainstDuckDB:
    def test_range_window_oracle(self, spark, ev_idx, ev_pdf):
        w = _range_window(range_ms=15_000)
        aggs = [
            AggSpec("sum", "price", "w", "s"),
            AggSpec("count", "price", "w", "c"),
            AggSpec("max", "price", "w", "mx"),
        ]
        feats = compute_window_features(ev_idx, {}, w, aggs)
        joined = ev_idx.select("userid", "ts", IDX_COL).join(feats, on=IDX_COL).drop(IDX_COL)
        sql = """
            SELECT userid, ts,
                   sum(price)   OVER win AS s,
                   count(price) OVER win AS c,
                   max(price)   OVER win AS mx
            FROM events
            WINDOW win AS (PARTITION BY userid ORDER BY ts
                           RANGE BETWEEN 15000 PRECEDING AND CURRENT ROW)
        """
        assert_equivalent(joined, sql, events=ev_pdf)

    def test_rows_window_oracle(self, spark, ev_idx, ev_pdf):
        w = _rows_window(rows=4)
        aggs = [AggSpec("avg", "price", "w", "a")]
        feats = compute_window_features(ev_idx, {}, w, aggs)
        joined = ev_idx.select("userid", "ts", IDX_COL).join(feats, on=IDX_COL).drop(IDX_COL)
        sql = """
            SELECT userid, ts,
                   avg(price) OVER (PARTITION BY userid ORDER BY ts
                                    ROWS BETWEEN 3 PRECEDING AND CURRENT ROW) AS a
            FROM events
        """
        assert_equivalent(joined, sql, events=ev_pdf)

    def test_window_union_oracle(self, spark, ev_idx, ev_pdf, od_pdf):
        """WINDOW UNION expressed in DuckDB via the composite-order trick:
        ord = 2*ts + flag is unique and RANGE over it reproduces the
        'unions tie-break into the window' semantics."""
        range_ms = 10_000
        w = _range_window(range_ms=range_ms, unions=("orders",))
        aggs = [AggSpec("sum", "price", "w", "s"), AggSpec("count", "price", "w", "c")]
        orders_df = spark.createDataFrame(od_pdf)
        feats = compute_window_features(ev_idx, {"orders": orders_df}, w, aggs)
        joined = ev_idx.select("userid", "ts", IDX_COL).join(feats, on=IDX_COL).drop(IDX_COL)
        sql = f"""
            WITH allrows AS (
                SELECT userid, ts, price, 1 AS flag FROM events
                UNION ALL
                SELECT userid, ts, price, 0 AS flag FROM orders
            ), win AS (
                SELECT userid, ts, flag,
                       sum(price)   OVER w AS s,
                       count(price) OVER w AS c
                FROM allrows
                WINDOW w AS (PARTITION BY userid ORDER BY (2*ts + flag)
                             RANGE BETWEEN {2 * range_ms + 1} PRECEDING AND CURRENT ROW)
            )
            SELECT userid, ts, s, c FROM win WHERE flag = 1
        """
        assert_equivalent(joined, sql, events=ev_pdf, orders=od_pdf)


class TestAgainstBruteForce:
    """ML-specific aggregates DuckDB cannot express — checked against the
    independent pandas reference."""

    @pytest.mark.parametrize(
        "agg",
        [
            AggSpec("distinct_count", "etype", "w", "out"),
            AggSpec("topn_frequency", "category", "w", "out", params=(2,)),
            AggSpec("drawdown", "price", "w", "out"),
            AggSpec("ew_avg", "price", "w", "out", params=(0.3,)),
            AggSpec("avg_cate", "price", "w", "out", params=("category",)),
            AggSpec("avg_cate", "price", "w", "out", params=("category",), where=Condition("quantity", ">", 1)),
            AggSpec("sum", "price", "w", "out", where=Condition("quantity", ">", 2)),
        ],
        ids=["distinct", "topn", "drawdown", "ew_avg", "avg_cate", "avg_cate_where", "sum_where"],
    )
    def test_ml_aggregates_match_reference(self, spark, ev_idx, ev_pdf, agg):
        w = _range_window(range_ms=20_000)
        feats = compute_window_features(ev_idx, {}, w, [agg]).toPandas()
        ordered = (
            ev_idx.select("ts", IDX_COL)
            .toPandas()
            .merge(feats, on=IDX_COL)
            .sort_values("ts")
            .reset_index(drop=True)
        )
        script = FeatureScript(
            base_table="events", key_col="userid", ts_col="ts",
            windows=(w,), aggs=(agg,),
        )
        small = ev_pdf.iloc[:150]  # brute force is O(n^2)
        ref = brute_force_features(small, {}, script)
        got = ordered.iloc[:150]["out"].reset_index(drop=True)
        want = ref["out"]
        if want.dtype.kind == "f":
            pd.testing.assert_series_equal(got.astype("float64"), want.astype("float64"),
                                           check_names=False, rtol=1e-9)
        else:
            assert got.tolist() == want.tolist()

    def test_rows_window_union_matches_reference(self, spark, ev_idx, ev_pdf, od_pdf):
        w = _rows_window(rows=6, unions=("orders",))
        agg = AggSpec("sum", "price", "w", "out")
        orders_df = spark.createDataFrame(od_pdf)
        feats = compute_window_features(ev_idx, {"orders": orders_df}, w, [agg]).toPandas()
        ordered = (
            ev_idx.select("ts", IDX_COL).toPandas().merge(feats, on=IDX_COL)
            .sort_values("ts").reset_index(drop=True)
        )
        script = FeatureScript(
            base_table="events", key_col="userid", ts_col="ts", windows=(w,), aggs=(agg,)
        )
        small = ev_pdf.iloc[:120]
        od_small = od_pdf[od_pdf["ts"] <= int(small["ts"].max())]
        ref = brute_force_features(small, {"orders": od_small}, script)
        pd.testing.assert_series_equal(
            ordered.iloc[:120]["out"].astype("float64").reset_index(drop=True),
            ref["out"].astype("float64"),
            check_names=False, rtol=1e-9,
        )

    def test_native_baseline_rejects_union(self, ev_idx):
        with pytest.raises(ValueError):
            spark_native_window(ev_idx, _range_window(unions=("o",)), [AggSpec("sum", "price", "w", "s")])

    def test_native_baseline_rejects_ml_aggs(self, ev_idx):
        with pytest.raises(ValueError):
            spark_native_window(ev_idx, _range_window(), [AggSpec("drawdown", "price", "w", "d")])
