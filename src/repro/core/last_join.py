"""LAST JOIN (paper Section 4.1, "Stream Join") as a DataFrame transform.

``LAST JOIN`` attaches, to each base row, the most recent row of a
reference table with the same key and a timestamp not exceeding the base
row's — the lookup the online engine answers in O(log n) from the
time-ordered memtable. Offline, the optimized implementation cogroups
the two tables by key and runs a single backward ``merge_asof`` per
group (one sorted scan, no rank-and-filter); the baseline builds the
standard-SQL construction (join, ``row_number``, filter) for the
comparisons in Figure 17.

A true JVM physical operator is out of scope (see DESIGN.md): the
transformation is expressed through Catalyst's cogroup +
``applyInPandas``, which preserves the algorithmic shape (key-partitioned
single-pass merge) the paper's operator implements in C++.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F
from pyspark.sql.types import StructType


def last_join(
    base: DataFrame,
    ref: DataFrame,
    *,
    key: str,
    base_ts: str,
    ref_ts: str,
    select: list[str],
    prefix: str,
) -> DataFrame:
    """Optimized LAST JOIN: cogrouped backward as-of merge per key.

    Output = all base columns plus ``{prefix}_{col}`` for each selected
    reference column (NULL when no reference row precedes the base row).
    """
    out_schema = StructType(base.schema.fields.copy())
    ref_schema = {f.name: f for f in ref.schema.fields}
    for c in select:
        f_ = ref_schema[c]
        out_schema.add(f"{prefix}_{c}", f_.dataType, True)

    base_cols = [f.name for f in base.schema.fields]

    def join_group(b: pd.DataFrame, r: pd.DataFrame) -> pd.DataFrame:
        if b.empty:
            return pd.DataFrame({f.name: pd.Series(dtype="object") for f in out_schema.fields})
        b = b.sort_values(base_ts, kind="mergesort").reset_index(drop=True)
        if r.empty:
            out = b.copy()
            for c in select:
                out[f"{prefix}_{c}"] = None
            return out[[f.name for f in out_schema.fields]]
        # Private ts name avoids merge_asof suffixing when base and ref
        # share the timestamp column name.
        r = r.sort_values(ref_ts, kind="mergesort").reset_index(drop=True)
        r2 = pd.DataFrame({"__ref_ts": r[ref_ts]})
        for c in select:
            r2[f"{prefix}_{c}"] = r[c]
        merged = pd.merge_asof(
            b, r2, left_on=base_ts, right_on="__ref_ts", direction="backward"
        )
        return merged[[f.name for f in out_schema.fields]]

    return (
        base.groupBy(key)
        .cogroup(ref.groupBy(key))
        .applyInPandas(join_group, schema=out_schema)
    )


def last_join_sql_baseline(
    base: DataFrame,
    ref: DataFrame,
    *,
    key: str,
    base_ts: str,
    ref_ts: str,
    select: list[str],
    prefix: str,
) -> DataFrame:
    """Standard-SQL construction of the same result: left join every
    preceding reference row, rank by recency, keep rank 1 — the extra
    rank-and-filter work LAST JOIN eliminates."""
    base_cols = [f.name for f in base.schema.fields]
    b = base.alias("b")
    r = ref.alias("r")
    joined = b.join(
        r,
        on=[F.col(f"b.{key}") == F.col(f"r.{key}"), F.col(f"r.{ref_ts}") <= F.col(f"b.{base_ts}")],
        how="left",
    )
    # (key, base_ts) identifies a base row — timestamps are unique within a
    # table by construction — so ranking within that pair keeps every base row.
    w = Window.partitionBy(F.col(f"b.{key}"), F.col(f"b.{base_ts}")).orderBy(
        F.col(f"r.{ref_ts}").desc_nulls_last()
    )
    ranked = joined.withColumn("__rn", F.row_number().over(w)).filter(F.col("__rn") == 1)
    out_cols = [F.col(f"b.{c}").alias(c) for c in base_cols] + [
        F.col(f"r.{c}").alias(f"{prefix}_{c}") for c in select
    ]
    return ranked.select(*out_cols)
