"""Time-aware data-skew resolving (paper Section 6.2).

Salting-style random prefixes would scatter a key's rows across
partitions and break trailing-window ordering, so OpenMLDB instead
splits each key's data *by time*:

1. **Partition boundaries** — percentiles of the ORDER BY timestamp
   (approximate; Spark's ``approxQuantile`` stands in for the paper's
   HyperLogLog-based approximation — both avoid a full exact scan).
2. **Repartitioning identifiers** — every row gets a ``PART_ID`` from its
   timestamp's percentile range and ``EXPANDED_ROW = false``.
3. **Window-data augmentation** — each partition *i* > 0 additionally
   receives the rows of earlier partitions that fall inside its first
   window frame (``range_ms`` before its boundary), tagged
   ``EXPANDED_ROW = true``.
4. **Redistribution** — group by (original key, ``PART_ID``): parallelism
   rises from #keys to #keys × #quantiles.
5. **Compute** — the same kernel scan as the unoptimized executor, but
   emitting features only for ``EXPANDED_ROW = false`` rows; expanded
   rows supply context.

Output is byte-identical to ``compute_window_features`` (asserted by
tests) while hot keys split across cores.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.spec import AggSpec, WindowSpec
from repro.offline.windows import (
    build_window_input,
    make_group_compute_fn,
)

PART_ID = "__part_id"
EXPANDED_ROW = "__expanded_row"


def timestamp_boundaries(
    inp: DataFrame, ts_col: str, n_quantiles: int, *, relative_error: float = 0.01
) -> list[float]:
    """PERCENTILE_i boundary values splitting the data into n parts by time."""
    if n_quantiles < 2:
        return []
    probs = [i / n_quantiles for i in range(1, n_quantiles)]
    return inp.approxQuantile(ts_col, probs, relative_error)


def skew_resolved_window(
    base_with_idx: DataFrame,
    union_tables: dict[str, DataFrame],
    window: WindowSpec,
    aggs: list[AggSpec],
    *,
    n_quantiles: int = 4,
) -> DataFrame:
    """Skew-optimized window execution → DataFrame[IDX_COL, outs...].

    Only RANGE frames are supported: the augmentation width is the frame
    length, which a ROWS frame does not bound in time (matching the
    paper's timestamp-percentile formulation).
    """
    if window.range_ms is None:
        raise ValueError("skew resolving requires a RANGE (time) frame")
    inp, used, n_unions = build_window_input(base_with_idx, union_tables, window, aggs)
    ts_col = window.order_by
    bounds = timestamp_boundaries(inp, ts_col, n_quantiles)

    # PART_ID = count of boundaries at or below ts (rows in
    # (PERCENTILE_i, PERCENTILE_{i+1}] land in partition i+1).
    part = F.lit(0)
    for b in bounds:
        part = part + F.when(F.col(ts_col) > F.lit(b), 1).otherwise(0)
    tagged = inp.withColumn(PART_ID, part.cast("int")).withColumn(
        EXPANDED_ROW, F.lit(False)
    )

    # Augment: rows within one frame-length before partition i's lower
    # boundary are replicated into partition i as context-only rows.
    expansions = []
    for i, b in enumerate(bounds, start=1):
        exp = inp.filter(
            (F.col(ts_col) > F.lit(b) - F.lit(window.range_ms)) & (F.col(ts_col) <= F.lit(b))
        )
        expansions.append(
            exp.withColumn(PART_ID, F.lit(i).cast("int")).withColumn(
                EXPANDED_ROW, F.lit(True)
            )
        )
    full = tagged
    for e in expansions:
        full = full.unionByName(e)

    compute_group, out_schema = make_group_compute_fn(
        window, aggs, used, n_unions, compute_flag_col=EXPANDED_ROW
    )

    return full.groupBy(window.partition_by, PART_ID).applyInPandas(
        compute_group, schema=out_schema
    )
