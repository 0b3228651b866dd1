"""Job: reproduce Figures 10/11 (long-window pre-aggregation)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark  # noqa: E402

from repro.bench.online_experiments import fig10_preagg  # noqa: E402
from pyspark.sql import DataFrame, SparkSession  # noqa: E402


def run(spark: SparkSession) -> DataFrame:
    return emit(
        spark,
        "Figures 10/11: long-window pre-aggregation latency",
        fig10_preagg(),
    )


if __name__ == "__main__":
    run(get_spark("fig10_preagg"))
