"""Structured Streaming pre-aggregation tests: the streaming stateful
buckets must equal the batch groupBy and the in-process aggregator's
first level (the offline/online/streaming consistency triangle)."""
import pandas as pd
import pytest

from repro.core.kernels import finalize_state
from repro.online.memtable import MemTableStore
from repro.online.preagg import MultiLevelAggregator
from repro.online.streaming import (
    batch_preagg_buckets,
    streaming_preagg_buckets,
    write_stream_source,
)
from repro.oracle import assert_equivalent
from repro.synth_data import events_pdf

BUCKET_MS = 60_000


@pytest.fixture(scope="module")
def ev_pdf():
    return events_pdf(n=800, n_users=6, span_ms=900_000, seed=81)


@pytest.fixture(scope="module")
def stream_buckets(spark, tmp_path_factory, ev_pdf):
    src = tmp_path_factory.mktemp("stream_src")
    ckpt = tmp_path_factory.mktemp("stream_ckpt")
    write_stream_source(ev_pdf, str(src), n_files=5)
    df = streaming_preagg_buckets(
        spark,
        str(src),
        key_col="userid",
        ts_col="ts",
        value_col="price",
        bucket_ms=BUCKET_MS,
        checkpoint_path=str(ckpt),
        query_name="t_preagg",
    )
    df.persist().count()
    return df


class TestStreamingPreAgg:
    def test_equals_batch_groupby(self, spark, stream_buckets, ev_pdf):
        batch = batch_preagg_buckets(
            spark, ev_pdf, key_col="userid", ts_col="ts", value_col="price", bucket_ms=BUCKET_MS
        ).toPandas()
        stream = stream_buckets.toPandas()
        cols = ["userid", "bucket_start"]
        a = batch.sort_values(cols).reset_index(drop=True)
        b = stream.sort_values(cols).reset_index(drop=True)[a.columns]
        pd.testing.assert_frame_equal(a, b, check_dtype=False, rtol=1e-9)

    def test_equals_duckdb_oracle(self, stream_buckets, ev_pdf):
        sql = f"""
            SELECT userid,
                   (ts // {BUCKET_MS}) * {BUCKET_MS} AS bucket_start,
                   count(price)            AS cnt,
                   sum(price)              AS sum_v,
                   min(price)              AS min_v,
                   max(price)              AS max_v
            FROM events
            GROUP BY 1, 2
        """
        assert_equivalent(
            stream_buckets.select("userid", "bucket_start", "cnt", "sum_v", "min_v", "max_v"),
            sql,
            events=ev_pdf[["userid", "ts", "price"]],
        )

    def test_equals_inprocess_aggregator_level(self, stream_buckets, ev_pdf):
        """The streaming job materializes exactly the sums the in-process
        MultiLevelAggregator holds at the matching granularity level."""
        store = MemTableStore()
        table = store.load_pandas("events", ev_pdf, key_col="userid", ts_col="ts")
        agg = MultiLevelAggregator(table, func="sum", column="price", levels_ms=(BUCKET_MS,))
        agg.catch_up()
        stream = stream_buckets.toPandas()
        for _, row in stream.iterrows():
            per_key = agg._buckets[0][int(row["userid"])]
            assert finalize_state("sum", per_key[int(row["bucket_start"])]) == pytest.approx(
                row["sum_v"], rel=1e-9
            )
