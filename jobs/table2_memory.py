"""Job: reproduce Table 2 (memory saved by OpenMLDB vs Redis).

Usage: ``spark-submit jobs/table2_memory.py`` (Spark is only used to
return the rows as a DataFrame; the byte models are driver-side).
"""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark  # noqa: E402

from repro.bench.memory_experiments import (  # noqa: E402
    table2_rows,
    verify_row_bytes_against_codec,
)
from pyspark.sql import DataFrame, SparkSession  # noqa: E402


def run(spark: SparkSession) -> DataFrame:
    model_bytes, measured = verify_row_bytes_against_codec()
    print(f"[codec check] model row = {model_bytes} B, encoded mean = {measured:.1f} B")
    return emit(spark, "Table 2: memory resource saved by OpenMLDB (bytes)", table2_rows())


if __name__ == "__main__":
    run(get_spark("table2_memory"))
