"""Job: reproduce Figure 13 (time-aware data-skew optimization)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark  # noqa: E402

from repro.bench.offline_experiments import fig13_skew  # noqa: E402
from pyspark.sql import DataFrame, SparkSession  # noqa: E402


def run(spark: SparkSession) -> DataFrame:
    return emit(spark, "Figure 13: data skew optimization", fig13_skew(spark))


if __name__ == "__main__":
    run(get_spark("fig13_skew"))
