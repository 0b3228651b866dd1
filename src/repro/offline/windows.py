"""Offline window executors (batch side of the unified plan).

The OpenMLDB-style executor computes one window's features for every base
row with ``applyInPandas``: each partition-key group is sorted by
timestamp and scanned once, evaluating the shared kernels over the
trailing frame of each base row. Window UNION tables are folded into the
same groups before the scan.

Window-frame semantics (fixed across offline, online and the DuckDB
oracle; timestamps are unique *within* each table by construction):

* RANGE frame ``range_ms``: rows of the base table with
  ``cur.ts - range_ms <= ts < cur.ts``, rows of unioned tables with
  ``cur.ts - range_ms <= ts <= cur.ts``, plus the current row itself.
  (Unioned rows tie-break *into* the window — in request mode they are
  already stored when the request arrives.)
* ROWS frame ``rows``: the ``rows`` most recent rows of that candidate
  set, current row included.

A Spark-native baseline (:func:`spark_native_window`) expresses the same
single-table frames with Catalyst window functions — the "existing
system" side of Figures 8/12 and the cross-check for our executor.
"""
from __future__ import annotations

from typing import Iterable

import numpy as np
import pandas as pd
from pyspark.sql import Column, DataFrame, SparkSession, Window
from pyspark.sql import functions as F
from pyspark.sql.types import (
    DoubleType,
    LongType,
    StringType,
    StructField,
    StructType,
)

from repro.core.kernels import eval_aggs
from repro.core.spec import AggSpec, WindowSpec

#: name of the synthetic unique row id (Section 6.1's index column).
IDX_COL = "__idx"
BASE_FLAG = "__is_base"

#: Spark type of each aggregate's output.
_AGG_SPARK_TYPE = {
    "sum": DoubleType(),
    "count": LongType(),
    "min": DoubleType(),
    "max": DoubleType(),
    "avg": DoubleType(),
    "distinct_count": LongType(),
    "topn_frequency": StringType(),
    "drawdown": DoubleType(),
    "ew_avg": DoubleType(),
    "avg_cate": StringType(),
}


def add_index_column(df: DataFrame, order_by: str) -> DataFrame:
    """Attach the unique index column (Section 6.1's 'Column Add').

    ``row_number`` over a global ordering keeps ids dense and
    deterministic, so every parallel window job labels the same row with
    the same id and the Concat Join aligns exactly.

    The global window collapses the data to a single partition, and a
    SinglePartition input *satisfies* any clustered distribution — the
    planner would then skip the hash exchange before group stages and
    serialize every downstream ``applyInPandas``. Repartitioning here
    restores shuffle parallelism for all consumers.
    """
    w = Window.orderBy(F.col(order_by).asc())
    indexed = df.withColumn(IDX_COL, F.row_number().over(w).cast("long"))
    n_part = int(df.sparkSession.conf.get("spark.sql.shuffle.partitions", "64"))
    return indexed.repartition(n_part)


def _used_columns(window: WindowSpec, aggs: Iterable[AggSpec]) -> list[str]:
    used = {window.partition_by, window.order_by}
    for a in aggs:
        used.add(a.column)
        if a.where is not None:
            used.add(a.where.col)
        if a.func == "avg_cate":
            used.add(str(a.params[0]))
    return sorted(used)


def _window_positions(ts: np.ndarray, pos: int, window: WindowSpec) -> slice:
    """Frame [start, pos] within a time-sorted group for the base row at ``pos``.

    The group is sorted by (ts, is_base) so unioned rows with a tying
    timestamp precede the current base row and land inside the frame.
    """
    if window.range_ms is not None:
        lo_ts = ts[pos] - window.range_ms
        start = int(np.searchsorted(ts, lo_ts, side="left"))
    else:
        start = max(0, pos + 1 - window.rows)
    return slice(start, pos + 1)


def build_window_input(
    base_with_idx: DataFrame,
    union_tables: dict[str, DataFrame],
    window: WindowSpec,
    aggs: list[AggSpec],
) -> tuple[DataFrame, list[str], int]:
    """Tagged union of base + WINDOW UNION tables for one physical window.

    Returns (input DataFrame, used columns, n_unions). ``BASE_FLAG``
    doubles as the cross-table tie-break: union table *i* gets ordinal
    *i*, the base table gets ``n_unions``, so equal-timestamp rows sort
    deterministically (unions before base, in declaration order) —
    timestamps are unique *within* each table, making (ts, flag) total.
    """
    used = _used_columns(window, aggs)
    n_unions = len(window.union_tables)
    base_part = base_with_idx.select(
        *[F.col(c) for c in used], F.col(IDX_COL), F.lit(n_unions).alias(BASE_FLAG)
    )
    parts = [base_part]
    for ordinal, name in enumerate(window.union_tables):
        u = union_tables[name]
        parts.append(
            u.select(
                *[F.col(c) for c in used],
                F.lit(None).cast("long").alias(IDX_COL),
                F.lit(ordinal).alias(BASE_FLAG),
            )
        )
    inp = parts[0]
    for p in parts[1:]:
        inp = inp.unionByName(p)
    return inp, used, n_unions


def window_output_schema(aggs: list[AggSpec]) -> StructType:
    """[IDX_COL, one field per aggregate] — every executor's output layout."""
    return StructType(
        [StructField(IDX_COL, LongType())]
        + [StructField(a.out, _AGG_SPARK_TYPE[a.func]) for a in aggs]
    )


#: aggregates the vectorized prefix-sum fast path can serve.
_FAST_PATH_FUNCS = {"sum", "count", "avg"}


def _fast_path_eligible(aggs: list[AggSpec]) -> bool:
    return all(a.func in _FAST_PATH_FUNCS and a.where is None for a in aggs)


def make_group_compute_fn(
    window: WindowSpec,
    aggs: list[AggSpec],
    used: list[str],
    n_unions: int,
    *,
    compute_flag_col: str | None = None,
):
    """Per-group pandas kernel: sorted scan evaluating the shared kernels.

    Unconditional sum/count/avg aggregates take a vectorized **incremental
    fast path** — one prefix-sum per column, window values as differences
    of prefix sums at the frame boundaries — the offline counterpart of
    the online engine's subtract-and-evict (the same O(1)-per-row cost the
    paper's C++ engine gets). Everything else falls back to the shared
    per-row kernels, preserving exact kernel semantics.

    When ``compute_flag_col`` is given (the skew resolver's EXPANDED_ROW),
    rows with a truthy flag provide window *context* but produce no output
    row — Section 6.2's augment-then-skip rule.
    """
    out_schema = window_output_schema(aggs)
    ts_col = window.order_by
    fast = _fast_path_eligible(aggs)

    def _empty() -> pd.DataFrame:
        return pd.DataFrame({f.name: pd.Series(dtype="object") for f in out_schema})

    def _sorted_arrays(pdf: pd.DataFrame):
        pdf = pdf.sort_values([ts_col, BASE_FLAG], kind="mergesort").reset_index(drop=True)
        ts = pdf[ts_col].to_numpy()
        flags = pdf[BASE_FLAG].to_numpy()
        is_target = flags == n_unions
        if compute_flag_col is not None:
            is_target = is_target & (~pdf[compute_flag_col].to_numpy().astype(bool))
        return pdf, ts, np.flatnonzero(is_target)

    def compute_group_fast(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf, ts, base_pos = _sorted_arrays(pdf)
        if len(base_pos) == 0:
            return _empty()
        ends = base_pos + 1
        if window.range_ms is not None:
            starts = np.searchsorted(ts, ts[base_pos] - window.range_ms, side="left")
        else:
            starts = np.maximum(0, ends - window.rows)
        counts = (ends - starts).astype("int64")
        out = {IDX_COL: pdf[IDX_COL].to_numpy()[base_pos].astype("int64")}
        prefixes: dict[str, np.ndarray] = {}
        for a in aggs:
            if a.column not in prefixes:
                v = pdf[a.column].to_numpy(dtype="float64")
                prefixes[a.column] = np.concatenate([[0.0], np.cumsum(v)])
            p = prefixes[a.column]
            if a.func == "count":
                out[a.out] = counts
            elif a.func == "sum":
                out[a.out] = p[ends] - p[starts]
            else:  # avg
                out[a.out] = (p[ends] - p[starts]) / counts
        return pd.DataFrame(out)[[f.name for f in out_schema]]

    def compute_group(pdf: pd.DataFrame) -> pd.DataFrame:
        pdf, ts, base_pos = _sorted_arrays(pdf)
        cols = {c: pdf[c].to_numpy() for c in used}
        records = []
        for pos in base_pos:
            sl = _window_positions(ts, int(pos), window)
            frame_cols = {c: arr[sl] for c, arr in cols.items()}
            feats = eval_aggs(frame_cols, aggs)
            feats[IDX_COL] = int(pdf[IDX_COL].iloc[pos])
            records.append(feats)
        if not records:
            return _empty()
        out = pd.DataFrame.from_records(records)
        return out[[f.name for f in out_schema]]

    return (compute_group_fast if fast else compute_group), out_schema


def compute_window_features(
    base_with_idx: DataFrame,
    union_tables: dict[str, DataFrame],
    window: WindowSpec,
    aggs: list[AggSpec],
) -> DataFrame:
    """One window's features for every base row → DataFrame[IDX_COL, outs...].

    Implements the per-group sorted scan with the shared kernels; this is
    the unit the multi-window optimizer (Section 6.1) parallelizes and the
    skew resolver (Section 6.2) repartitions.
    """
    inp, used, n_unions = build_window_input(base_with_idx, union_tables, window, aggs)
    compute_group, out_schema = make_group_compute_fn(window, aggs, used, n_unions)
    return inp.groupBy(window.partition_by).applyInPandas(compute_group, schema=out_schema)


def spark_native_window(
    base_with_idx: DataFrame, window: WindowSpec, aggs: list[AggSpec]
) -> DataFrame:
    """Catalyst-native equivalent for standard aggregates over a single table.

    Supports ``sum/count/avg/min/max`` without WINDOW UNION — the subset
    ANSI SQL window functions express — and returns the same
    [IDX_COL, outs...] layout for direct comparison against
    :func:`compute_window_features`.
    """
    if window.union_tables:
        raise ValueError("Spark-native baseline cannot express WINDOW UNION")
    w = Window.partitionBy(window.partition_by).orderBy(F.col(window.order_by).asc())
    if window.range_ms is not None:
        w = w.rangeBetween(-window.range_ms, 0)
    else:
        w = w.rowsBetween(-(window.rows - 1), 0)
    native = {"sum": F.sum, "count": F.count, "avg": F.avg, "min": F.min, "max": F.max}
    cols: list[Column] = [F.col(IDX_COL)]
    for a in aggs:
        if a.func not in native:
            raise ValueError(f"{a.func!r} has no Spark-native window equivalent")
        if a.where is not None:
            raise ValueError("conditional aggregates need the kernel executor")
        expr = native[a.func](F.col(a.column)).over(w)
        if a.func == "count":
            expr = expr.cast("long")
        elif a.func in ("sum", "avg", "min", "max"):
            expr = expr.cast("double")
        cols.append(expr.alias(a.out))
    return base_with_idx.select(*cols)
