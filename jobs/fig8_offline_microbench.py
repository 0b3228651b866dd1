"""Job: reproduce Figure 8 (offline MicroBench: single/multi/skewed)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark  # noqa: E402

from repro.bench.offline_experiments import fig8_offline_microbench  # noqa: E402
from pyspark.sql import DataFrame, SparkSession  # noqa: E402


def run(spark: SparkSession) -> DataFrame:
    return emit(
        spark,
        "Figure 8: offline MicroBench — Spark-native vs OpenMLDB plan",
        fig8_offline_microbench(spark),
    )


if __name__ == "__main__":
    run(get_spark("fig8_offline_microbench"))
