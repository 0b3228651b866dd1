"""Shared glue for job entrypoints: session creation and table output.

Every job exposes ``run(spark) -> DataFrame`` (rows of the reproduced
paper table) and prints the same rows as an aligned text table, so
``spark-submit jobs/<name>.py`` output can be diffed against
EXPERIMENTS.md directly.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.bench.harness import print_table


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        # See conftest.py: byte-based AQE coalescing serializes Python-heavy
        # applyInPandas stages; keep the shuffle parallelism.
        .config("spark.sql.adaptive.coalescePartitions.enabled", "false")
        .getOrCreate()
    )


def rows_to_df(spark: SparkSession, rows: list[dict]) -> DataFrame:
    return spark.createDataFrame(pd.DataFrame(rows).astype(str))


def emit(spark: SparkSession, title: str, rows: list[dict]) -> DataFrame:
    print_table(title, rows)
    return rows_to_df(spark, rows)
