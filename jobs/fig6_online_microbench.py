"""Job: reproduce Figure 6 (online MicroBench latency/throughput)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark  # noqa: E402

from repro.bench.online_experiments import fig6_online_microbench  # noqa: E402
from pyspark.sql import DataFrame, SparkSession  # noqa: E402


def run(spark: SparkSession) -> DataFrame:
    return emit(
        spark,
        "Figure 6: online MicroBench — OpenMLDB vs DuckDB vs full-scan",
        fig6_online_microbench(),
    )


if __name__ == "__main__":
    run(get_spark("fig6_online_microbench"))
