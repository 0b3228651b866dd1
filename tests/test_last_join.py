"""LAST JOIN tests: optimized cogroup/merge_asof vs the standard-SQL
baseline vs DuckDB's ASOF JOIN."""
import pandas as pd
import pytest

from repro.core.last_join import last_join, last_join_sql_baseline
from repro.oracle import assert_equivalent
from repro.synth_data import events_pdf, orders_stream_pdf


@pytest.fixture(scope="module")
def base_pdf():
    return events_pdf(n=300, n_users=5, span_ms=60_000, seed=31)


@pytest.fixture(scope="module")
def ref_pdf():
    return orders_stream_pdf(n=120, n_users=7, span_ms=60_000, seed=32)


@pytest.fixture(scope="module")
def dfs(spark, base_pdf, ref_pdf):
    return spark.createDataFrame(base_pdf), spark.createDataFrame(ref_pdf)


KW = dict(key="userid", base_ts="ts", ref_ts="ts", select=["price", "quantity"], prefix="ref")


class TestLastJoin:
    def test_matches_duckdb_asof(self, dfs, base_pdf, ref_pdf):
        base, ref = dfs
        got = last_join(base, ref, **KW).select(
            "userid", "ts", "ref_price", "ref_quantity"
        )
        sql = """
            SELECT b.userid, b.ts, r.price AS ref_price, r.quantity AS ref_quantity
            FROM base b ASOF LEFT JOIN ref r
              ON b.userid = r.userid AND r.ts <= b.ts
        """
        assert_equivalent(got, sql, base=base_pdf, ref=ref_pdf)

    def test_matches_sql_baseline(self, dfs):
        base, ref = dfs
        a = last_join(base, ref, **KW).toPandas()
        b = last_join_sql_baseline(base, ref, **KW).toPandas()
        cols = sorted(a.columns)
        a = a[cols].sort_values(["userid", "ts"]).reset_index(drop=True)
        b = b[cols].sort_values(["userid", "ts"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(a, b, check_dtype=False)

    def test_keeps_every_base_row(self, dfs, base_pdf):
        base, ref = dfs
        assert last_join(base, ref, **KW).count() == len(base_pdf)

    def test_unmatched_key_yields_null(self, spark):
        base = spark.createDataFrame(pd.DataFrame({"userid": [99], "ts": [1000]}))
        ref = spark.createDataFrame(pd.DataFrame({"userid": [1], "ts": [500], "price": [2.0], "quantity": [1]}))
        row = last_join(base, ref, **KW).collect()[0]
        assert row["ref_price"] is None

    def test_ref_row_after_base_ts_excluded(self, spark):
        base = spark.createDataFrame(pd.DataFrame({"userid": [1], "ts": [1000]}))
        ref = spark.createDataFrame(
            pd.DataFrame({"userid": [1, 1], "ts": [1500, 900], "price": [9.0, 5.0], "quantity": [1, 1]})
        )
        row = last_join(base, ref, **KW).collect()[0]
        assert row["ref_price"] == 5.0

    def test_equal_ts_included(self, spark):
        base = spark.createDataFrame(pd.DataFrame({"userid": [1], "ts": [1000]}))
        ref = spark.createDataFrame(
            pd.DataFrame({"userid": [1], "ts": [1000], "price": [7.0], "quantity": [2]})
        )
        row = last_join(base, ref, **KW).collect()[0]
        assert row["ref_price"] == 7.0
