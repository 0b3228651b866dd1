"""Time-aware skew resolving (Section 6.2): the repartitioned execution
must equal the unoptimized executor exactly, while multiplying groups."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.spec import AggSpec, WindowSpec
from repro.offline.skew import EXPANDED_ROW, PART_ID, skew_resolved_window, timestamp_boundaries
from repro.offline.windows import IDX_COL, add_index_column, compute_window_features
from repro.synth_data import events_pdf

W = WindowSpec(name="w", partition_by="userid", order_by="ts", range_ms=15_000)
AGGS = [
    AggSpec("sum", "price", "w", "s"),
    AggSpec("count", "price", "w", "c"),
    AggSpec("drawdown", "price", "w", "d"),
]


@pytest.fixture(scope="module")
def skewed_idx(spark):
    # alpha=1.4 concentrates most rows on one hot user — the skew case.
    pdf = events_pdf(n=600, n_users=8, span_ms=200_000, alpha=1.4, seed=51)
    df = add_index_column(spark.createDataFrame(pdf), "ts")
    df.persist().count()
    return df


def _sorted(pdf: pd.DataFrame) -> pd.DataFrame:
    return pdf.sort_values(IDX_COL).reset_index(drop=True)[sorted(pdf.columns)]


class TestCorrectness:
    @pytest.mark.parametrize("n_quantiles", [2, 4, 8])
    def test_equals_unoptimized(self, skewed_idx, n_quantiles):
        base = _sorted(compute_window_features(skewed_idx, {}, W, AGGS).toPandas())
        opt = _sorted(
            skew_resolved_window(skewed_idx, {}, W, AGGS, n_quantiles=n_quantiles).toPandas()
        )
        pd.testing.assert_frame_equal(base, opt, check_dtype=False, rtol=1e-9)

    def test_every_row_computed_exactly_once(self, skewed_idx):
        out = skew_resolved_window(skewed_idx, {}, W, AGGS, n_quantiles=4).toPandas()
        assert sorted(out[IDX_COL].tolist()) == list(range(1, 601))

    def test_rows_frame_rejected(self, skewed_idx):
        w = WindowSpec(name="w", partition_by="userid", order_by="ts", rows=5)
        with pytest.raises(ValueError):
            skew_resolved_window(skewed_idx, {}, w, AGGS)


class TestMechanics:
    def test_boundaries_are_time_ordered(self, skewed_idx):
        bounds = timestamp_boundaries(skewed_idx, "ts", 4)
        assert bounds == sorted(bounds)
        assert len(bounds) == 3

    def test_quantile_one_gives_no_bounds(self, skewed_idx):
        assert timestamp_boundaries(skewed_idx, "ts", 1) == []

    def test_parallelism_multiplied(self, spark, skewed_idx):
        """The (key, PART_ID) grouping must yield more groups than keys —
        the paper's 'parallelism up to keys x quantiles' claim."""
        from repro.offline.windows import build_window_input

        inp, _, _ = build_window_input(skewed_idx, {}, W, AGGS)
        bounds = timestamp_boundaries(inp, "ts", 4)
        part = F.lit(0)
        for b in bounds:
            part = part + F.when(F.col("ts") > F.lit(b), 1).otherwise(0)
        tagged = inp.withColumn(PART_ID, part)
        n_keys = inp.select("userid").distinct().count()
        n_groups = tagged.select("userid", PART_ID).distinct().count()
        assert n_groups > n_keys
