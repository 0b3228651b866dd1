"""Multi-window parallel optimization (Section 6.1): serial, parallel and
Spark-native executions must agree; the index column must align rows."""
import pandas as pd
import pytest

from repro.core.spec import AggSpec, WindowSpec
from repro.offline.multi_window import (
    kernel_parallel,
    kernel_serial,
    spark_serial_native,
)
from repro.offline.windows import add_index_column
from repro.synth_data import events_pdf

WINDOWS = [
    WindowSpec(name="w1", partition_by="userid", order_by="ts", range_ms=8_000),
    WindowSpec(name="w2", partition_by="category", order_by="ts", range_ms=20_000),
    WindowSpec(name="w3", partition_by="userid", order_by="ts", rows=5),
]
AGGS = [
    [AggSpec("sum", "price", "w1", "f1"), AggSpec("count", "price", "w1", "f2")],
    [AggSpec("avg", "price", "w2", "f3")],
    [AggSpec("max", "price", "w3", "f4")],
]


@pytest.fixture(scope="module")
def base_idx(spark):
    pdf = events_pdf(n=350, n_users=5, span_ms=100_000, seed=41)
    df = add_index_column(spark.createDataFrame(pdf), "ts")
    df.persist().count()
    return df


def _sorted(pdf: pd.DataFrame) -> pd.DataFrame:
    return pdf.sort_values(["userid", "ts"]).reset_index(drop=True)[sorted(pdf.columns)]


class TestEquivalence:
    def test_parallel_equals_serial(self, base_idx):
        a = _sorted(kernel_serial(base_idx, {}, WINDOWS, AGGS).toPandas())
        b = _sorted(kernel_parallel(base_idx, {}, WINDOWS, AGGS).toPandas())
        pd.testing.assert_frame_equal(a, b, check_dtype=False)

    def test_parallel_equals_spark_native(self, base_idx):
        a = _sorted(kernel_parallel(base_idx, {}, WINDOWS, AGGS).toPandas())
        c = _sorted(spark_serial_native(base_idx, WINDOWS, AGGS).toPandas())
        pd.testing.assert_frame_equal(a, c, check_dtype=False, rtol=1e-9)

    def test_feature_columns_present(self, base_idx):
        out = kernel_parallel(base_idx, {}, WINDOWS, AGGS)
        for f in ["f1", "f2", "f3", "f4"]:
            assert f in out.columns
        assert "__idx" not in out.columns

    def test_row_count_preserved(self, base_idx):
        assert kernel_parallel(base_idx, {}, WINDOWS, AGGS).count() == 350

    def test_different_partition_keys_align_correctly(self, base_idx):
        """w2 partitions by category, not userid — Concat Join must still
        label every row with its own window result (the index-column
        alignment problem the paper highlights)."""
        out = kernel_parallel(base_idx, {}, WINDOWS[:2], AGGS[:2]).toPandas()
        native = spark_serial_native(base_idx, WINDOWS[:2], AGGS[:2]).toPandas()
        a = _sorted(out)[["f1", "f3"]]
        b = _sorted(native)[["f1", "f3"]]
        pd.testing.assert_frame_equal(a, b, check_dtype=False, rtol=1e-9)
