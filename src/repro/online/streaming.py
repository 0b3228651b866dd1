"""Structured Streaming pre-aggregation (the distributed online substrate).

The paper's online engine maintains pre-aggregated bucket states as data
streams in (Section 5.1). This module expresses the same first-level
aggregator as a Spark Structured Streaming job: a stateful tumbling-window
aggregate per (key, bucket) that continuously materializes the partial
states (sum/count/min/max) which :class:`~repro.online.preagg.
MultiLevelAggregator` holds in memory. Tests assert the streaming job's
buckets equal both a batch groupBy and the in-process aggregator's
first level — the offline/online/streaming triangle of consistency.

The source is a directory of Parquet files (a stand-in for the binlog
shipping of a production deployment) processed with
``trigger(availableNow=True)``, so runs are deterministic and terminate.
"""
from __future__ import annotations

import os

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def write_stream_source(pdf: pd.DataFrame, path: str, *, n_files: int = 4) -> None:
    """Split a pandas event frame into Parquet chunks forming the stream.

    Chunks are contiguous in time (the frame is time-sorted), mimicking
    binlog segments arriving in order.
    """
    os.makedirs(path, exist_ok=True)
    n = len(pdf)
    step = max(1, (n + n_files - 1) // n_files)
    for i in range(0, n, step):
        pdf.iloc[i : i + step].to_parquet(os.path.join(path, f"part-{i // step:05d}.parquet"))


def streaming_preagg_buckets(
    spark: SparkSession,
    source_path: str,
    *,
    key_col: str,
    ts_col: str,
    value_col: str,
    bucket_ms: int,
    checkpoint_path: str,
    query_name: str = "preagg_buckets",
) -> DataFrame:
    """Run the stateful bucket aggregation to completion; return the buckets.

    Output columns: ``key_col``, ``bucket_start`` (epoch millis),
    ``cnt``, ``sum_v``, ``min_v``, ``max_v`` — the decomposable partial
    states of the first aggregator level.
    """
    schema = spark.read.parquet(source_path).schema
    stream = spark.readStream.schema(schema).parquet(source_path)
    # Integer-millis bucketing keeps the streaming job bit-identical to the
    # in-process aggregator's `ts // gran * gran` bucket assignment.
    bucketed = stream.withColumn(
        "bucket_start", (F.floor(F.col(ts_col) / F.lit(bucket_ms)) * F.lit(bucket_ms)).cast("long")
    )
    agg = bucketed.groupBy(key_col, "bucket_start").agg(
        F.count(F.col(value_col)).alias("cnt"),
        F.sum(F.col(value_col)).cast("double").alias("sum_v"),
        F.min(F.col(value_col)).cast("double").alias("min_v"),
        F.max(F.col(value_col)).cast("double").alias("max_v"),
    )
    q = (
        agg.writeStream.outputMode("complete")
        .format("memory")
        .queryName(query_name)
        .option("checkpointLocation", checkpoint_path)
        .trigger(availableNow=True)
        .start()
    )
    q.awaitTermination()
    return spark.table(query_name)


def batch_preagg_buckets(
    spark: SparkSession,
    pdf: pd.DataFrame,
    *,
    key_col: str,
    ts_col: str,
    value_col: str,
    bucket_ms: int,
) -> DataFrame:
    """The batch reference the streaming result must equal exactly."""
    df = spark.createDataFrame(pdf)
    bucketed = df.withColumn(
        "bucket_start", (F.floor(F.col(ts_col) / F.lit(bucket_ms)) * F.lit(bucket_ms)).cast("long")
    )
    return bucketed.groupBy(key_col, "bucket_start").agg(
        F.count(F.col(value_col)).alias("cnt"),
        F.sum(F.col(value_col)).cast("double").alias("sum_v"),
        F.min(F.col(value_col)).cast("double").alias("min_v"),
        F.max(F.col(value_col)).cast("double").alias("max_v"),
    )
