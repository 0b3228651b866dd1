"""Multi-window parallel optimization (paper Section 6.1).

A query with several independent windows over the same table is executed
as: Simple Project (+ 'Column Add' of the unique index column) → one
branch per window → Concat Join on the index column → drop the index.
Traditional engines compute the windows serially — Spark SQL chains a
sort + window operator per distinct partition spec through a single data
flow — so the elapsed time is the *sum* of the windows; the optimized
plan runs branches concurrently so it approaches the *max*.

Three comparable executions are provided for Figure 12:

* :func:`spark_serial_native` — Spark's own window functions chained in
  one select (the "traditional" baseline).
* :func:`kernel_serial` — our executor, one branch materialized at a time
  (OpenMLDB without the optimization).
* :func:`kernel_parallel` — branches submitted concurrently from driver
  threads (Spark's scheduler interleaves the jobs across cores), then
  Concat Join. This is the optimization itself.
"""
from __future__ import annotations

from concurrent.futures import ThreadPoolExecutor

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.spec import AggSpec, WindowSpec
from repro.offline.windows import (
    IDX_COL,
    compute_window_features,
    spark_native_window,
)


def materialize_parallel(branches: list[DataFrame]) -> list[DataFrame]:
    """Persist + force each branch concurrently; returns the persisted DFs."""
    persisted = [b.persist() for b in branches]
    with ThreadPoolExecutor(max_workers=max(1, len(persisted))) as pool:
        list(pool.map(lambda d: d.count(), persisted))
    return persisted


def _concat_join(base_with_idx: DataFrame, branches: list[DataFrame], feature_names: list[str]) -> DataFrame:
    out = base_with_idx
    for b in branches:
        out = out.join(b, on=IDX_COL, how="left")
    base_cols = [f.name for f in base_with_idx.schema.fields if f.name != IDX_COL]
    return out.select(*base_cols, *feature_names)


def spark_serial_native(
    base_with_idx: DataFrame, windows: list[WindowSpec], agg_groups: list[list[AggSpec]]
) -> DataFrame:
    """Traditional plan: every window expression in one serial pipeline."""
    cols = [F.col(f.name) for f in base_with_idx.schema.fields if f.name != IDX_COL]
    native = {"sum": F.sum, "count": F.count, "avg": F.avg, "min": F.min, "max": F.max}
    for w_spec, aggs in zip(windows, agg_groups):
        w = Window.partitionBy(w_spec.partition_by).orderBy(F.col(w_spec.order_by).asc())
        if w_spec.range_ms is not None:
            w = w.rangeBetween(-w_spec.range_ms, 0)
        else:
            w = w.rowsBetween(-(w_spec.rows - 1), 0)
        for a in aggs:
            expr = native[a.func](F.col(a.column)).over(w)
            expr = expr.cast("long") if a.func == "count" else expr.cast("double")
            cols.append(expr.alias(a.out))
    return base_with_idx.select(*cols)


def _branches(
    base_with_idx: DataFrame,
    union_tables: dict[str, DataFrame],
    windows: list[WindowSpec],
    agg_groups: list[list[AggSpec]],
) -> list[DataFrame]:
    return [
        compute_window_features(base_with_idx, union_tables, w, aggs)
        for w, aggs in zip(windows, agg_groups)
    ]


def kernel_serial(
    base_with_idx: DataFrame,
    union_tables: dict[str, DataFrame],
    windows: list[WindowSpec],
    agg_groups: list[list[AggSpec]],
) -> DataFrame:
    """Our executor without the optimization: branches forced one by one."""
    branches = _branches(base_with_idx, union_tables, windows, agg_groups)
    persisted = []
    for b in branches:
        p = b.persist()
        p.count()  # serial materialization barrier
        persisted.append(p)
    names = [a.out for aggs in agg_groups for a in aggs]
    return _concat_join(base_with_idx, persisted, names)


def kernel_parallel(
    base_with_idx: DataFrame,
    union_tables: dict[str, DataFrame],
    windows: list[WindowSpec],
    agg_groups: list[list[AggSpec]],
) -> DataFrame:
    """The Section 6.1 plan: concurrent branches + Concat Join on the index."""
    branches = _branches(base_with_idx, union_tables, windows, agg_groups)
    persisted = materialize_parallel(branches)
    names = [a.out for aggs in agg_groups for a in aggs]
    return _concat_join(base_with_idx, persisted, names)


def unpersist_all(dfs: list[DataFrame]) -> None:
    """Benchmark hygiene: release branch caches between measurements."""
    for d in dfs:
        d.unpersist()
