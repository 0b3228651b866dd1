"""Job: reproduce Table 3 (request latency for growing feature counts)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark  # noqa: E402

from repro.bench.online_experiments import table3_feature_scaling  # noqa: E402
from pyspark.sql import DataFrame, SparkSession  # noqa: E402


def run(spark: SparkSession) -> DataFrame:
    return emit(
        spark,
        "Table 3: performance for different feature numbers (ms)",
        table3_feature_scaling(),
    )


if __name__ == "__main__":
    run(get_spark("table3_feature_scaling"))
