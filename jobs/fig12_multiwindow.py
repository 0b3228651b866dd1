"""Job: reproduce Figure 12 (multi-window parallel optimization)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark  # noqa: E402

from repro.bench.offline_experiments import fig12_multiwindow  # noqa: E402
from pyspark.sql import DataFrame, SparkSession  # noqa: E402


def run(spark: SparkSession) -> DataFrame:
    return emit(
        spark,
        "Figure 12: multi-window serial vs parallel execution",
        fig12_multiwindow(spark),
    )


if __name__ == "__main__":
    run(get_spark("fig12_multiwindow"))
