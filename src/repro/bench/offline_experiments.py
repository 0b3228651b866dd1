"""Offline-side experiments: Figure 8 (offline MicroBench), Figure 12
(multi-window parallel optimization), Figure 13 (data-skew optimization).

All comparisons run on the same Spark substrate so the measured ratios
isolate the *algorithms* (parallel branches + concat join, time-aware
repartitioning) rather than the C++-vs-JVM gap the paper also enjoys —
see DESIGN.md's substitution table.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro.bench.harness import time_call
from repro.core.spec import AggSpec, WindowSpec
from repro.offline.multi_window import (
    kernel_parallel,
    kernel_serial,
    spark_serial_native,
)
from repro.offline.skew import skew_resolved_window
from repro.offline.windows import add_index_column, compute_window_features
from repro.synth_data import events_pdf


def _base(spark: SparkSession, *, n: int, n_users: int, alpha: float = 0.0,
          span_ms: int = 3_600_000, seed: int = 101) -> DataFrame:
    pdf = events_pdf(n=n, n_users=n_users, span_ms=span_ms, alpha=alpha, seed=seed)
    df = add_index_column(spark.createDataFrame(pdf), "ts")
    df.persist().count()
    return df


def _warmup(base: DataFrame) -> None:
    """One throwaway kernel job so Python-worker spawn cost (large under
    gVisor) is paid before any measured run — removes cold-start bias."""
    w = WindowSpec(name="warm", partition_by="userid", order_by="ts", range_ms=1_000)
    aggs = [AggSpec("drawdown", "price", "warm", "d")]
    compute_window_features(base.limit(5_000), {}, w, aggs).count()


def _windows(n_windows: int, range_ms: int) -> tuple[list[WindowSpec], list[list[AggSpec]]]:
    keys = ["userid", "category", "etype", "quantity"]
    windows, agg_groups = [], []
    for i in range(n_windows):
        w = WindowSpec(
            name=f"w{i}", partition_by=keys[i % len(keys)], order_by="ts",
            range_ms=range_ms * (1 + i % 2),
        )
        windows.append(w)
        agg_groups.append(
            [AggSpec("sum", "price", w.name, f"s{i}"), AggSpec("avg", "price", w.name, f"a{i}")]
        )
    return windows, agg_groups


def fig8_offline_microbench(spark: SparkSession, *, n: int = 150_000,
                            n_skew: int = 500_000) -> list[dict]:
    """Single-window / multi-window / skew rows of the offline MicroBench."""
    rows = []
    # Single window, uniform keys.
    base = _base(spark, n=n, n_users=64)
    _warmup(base)
    w, g = _windows(1, 30_000)
    t_native = time_call(lambda: spark_serial_native(base, w, g).count())
    t_kernel = time_call(lambda: kernel_parallel(base, {}, w, g).count())
    rows.append({
        "Workload": "single-window",
        "SparkNative (s)": round(t_native, 2),
        "OpenMLDB-plan (s)": round(t_kernel, 2),
        "Speedup": f"{t_native / t_kernel:.2f}x",
    })
    # Multi window (4 windows, distinct partition keys).
    w, g = _windows(4, 30_000)
    t_native = time_call(lambda: spark_serial_native(base, w, g).count())
    t_kernel = time_call(lambda: kernel_parallel(base, {}, w, g).count())
    rows.append({
        "Workload": "multi-window(4)",
        "SparkNative (s)": round(t_native, 2),
        "OpenMLDB-plan (s)": round(t_kernel, 2),
        "Speedup": f"{t_native / t_kernel:.2f}x",
    })
    base.unpersist()
    # Skewed keys: hot partition dominates; skew resolving splits it. The
    # drawdown aggregate keeps the work on the per-row kernel path, where
    # the hot group's serial scan is the critical path being optimized.
    skew_base = _base(spark, n=n_skew, n_users=24, alpha=2.2, seed=102)
    _warmup(skew_base)
    w1 = WindowSpec(name="w", partition_by="userid", order_by="ts", range_ms=60_000)
    aggs = [
        AggSpec("sum", "price", "w", "s"),
        AggSpec("avg", "price", "w", "a"),
        AggSpec("drawdown", "price", "w", "d"),
    ]
    t_plain = time_call(lambda: compute_window_features(skew_base, {}, w1, aggs).count())
    t_skew = time_call(
        lambda: skew_resolved_window(skew_base, {}, w1, aggs, n_quantiles=8).count()
    )
    rows.append({
        "Workload": "skewed-window",
        "SparkNative (s)": round(t_plain, 2),
        "OpenMLDB-plan (s)": round(t_skew, 2),
        "Speedup": f"{t_plain / t_skew:.2f}x",
    })
    skew_base.unpersist()
    return rows


def fig12_multiwindow(spark: SparkSession, *, n: int = 40_000,
                      sizes=(("small", 5_000), ("medium", 30_000), ("large", 120_000)),
                      n_windows: int = 4) -> list[dict]:
    """Serial vs parallel multi-window execution across window sizes."""
    base = _base(spark, n=n, n_users=48, seed=103)
    _warmup(base)
    rows = []
    for label, range_ms in sizes:
        w, g = _windows(n_windows, range_ms)
        t_serial = time_call(lambda: kernel_serial(base, {}, w, g).count())
        t_parallel = time_call(lambda: kernel_parallel(base, {}, w, g).count())
        t_native = time_call(lambda: spark_serial_native(base, w, g).count())
        rows.append({
            "Windows": label,
            "Serial (s)": round(t_serial, 2),
            "Parallel (s)": round(t_parallel, 2),
            "SparkNative (s)": round(t_native, 2),
            "Parallel speedup vs serial": f"{t_serial / t_parallel:.2f}x",
            "Parallel speedup vs Spark": f"{t_native / t_parallel:.2f}x",
        })
    base.unpersist()
    return rows


def fig13_skew(spark: SparkSession, *, n: int = 500_000,
               quantiles=(2, 4, 8)) -> list[dict]:
    """Window job on Zipf-skewed keys: baseline vs skew-N (Figure 13).

    The aggregate set includes ``drawdown`` so the work runs on the
    per-row kernel path (a fast vectorizable aggregate would be overhead-
    bound at this scale and hide the partitioning effect).
    """
    base = _base(spark, n=n, n_users=24, alpha=2.2, seed=104)
    _warmup(base)
    w = WindowSpec(name="w", partition_by="userid", order_by="ts", range_ms=60_000)
    aggs = [
        AggSpec("sum", "price", "w", "s"),
        AggSpec("avg", "price", "w", "a"),
        AggSpec("drawdown", "price", "w", "d"),
    ]
    # Spark's window functions cannot express drawdown; its reference row
    # runs the two standard aggregates only (a lower bound on its time).
    w_native = [WindowSpec(name="w", partition_by="userid", order_by="ts", range_ms=60_000)]
    native_aggs = [a for a in aggs if a.func in ("sum", "avg")]
    t_spark = time_call(lambda: spark_serial_native(base, w_native, [native_aggs]).count())
    t_base = time_call(lambda: compute_window_features(base, {}, w, aggs).count())
    rows = [
        {"Config": "Spark-native", "Time (s)": round(t_spark, 2), "Speedup vs Spark": "1.00x"},
        {
            "Config": "no-skew-opt",
            "Time (s)": round(t_base, 2),
            "Speedup vs Spark": f"{t_spark / t_base:.2f}x",
        },
    ]
    for q in quantiles:
        t_q = time_call(
            lambda: skew_resolved_window(base, {}, w, aggs, n_quantiles=q).count()
        )
        rows.append({
            "Config": f"skew-{q}",
            "Time (s)": round(t_q, 2),
            "Speedup vs Spark": f"{t_spark / t_q:.2f}x",
        })
    base.unpersist()
    return rows
