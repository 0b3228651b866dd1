"""Feature-script AST — the "OpenMLDB SQL" surface of the reproduction.

A :class:`FeatureScript` is the deployable unit: one base stream table,
named trailing windows over it (optionally UNIONed with other stream
tables — the WINDOW UNION clause), window aggregations drawn from the
shared kernel registry, and LAST JOINs against reference tables. The
unified plan generator (``repro.core.plan``) compiles a script once into a
plan whose offline (Spark batch) and online (request-mode) executions are
guaranteed consistent because they share the same compiled kernels.

Everything is hashable/frozen so compiled plans can be cached
(Section 4.2's compilation cache).
"""
from __future__ import annotations

from dataclasses import dataclass, field

_OPS = {">", ">=", "<", "<=", "==", "!="}


@dataclass(frozen=True)
class Condition:
    """A simple predicate ``col <op> value`` (conditional aggregations)."""

    col: str
    op: str
    value: float

    def __post_init__(self) -> None:
        if self.op not in _OPS:
            raise ValueError(f"unsupported op {self.op!r}")

    def sql(self) -> str:
        op = "=" if self.op == "==" else self.op
        return f"{self.col} {op} {self.value!r}"


@dataclass(frozen=True)
class WindowSpec:
    """A trailing window: PARTITION BY key, ORDER BY ts, range or rows frame.

    Exactly one of ``range_ms`` (RANGE BETWEEN <t> PRECEDING AND CURRENT
    ROW, in milliseconds) or ``rows`` (ROWS BETWEEN <n-1> PRECEDING AND
    CURRENT ROW, i.e. the latest ``rows`` tuples including the current one)
    must be set. ``union_tables`` lists extra stream tables whose tuples
    join the window (the WINDOW UNION clause); unioned tables contribute
    rows but never act as the "current" row, matching OpenMLDB semantics.
    """

    name: str
    partition_by: str
    order_by: str
    range_ms: int | None = None
    rows: int | None = None
    union_tables: tuple[str, ...] = ()

    def __post_init__(self) -> None:
        if (self.range_ms is None) == (self.rows is None):
            raise ValueError(f"window {self.name!r}: set exactly one of range_ms/rows")
        if self.range_ms is not None and self.range_ms <= 0:
            raise ValueError(f"window {self.name!r}: range_ms must be positive")
        if self.rows is not None and self.rows <= 0:
            raise ValueError(f"window {self.name!r}: rows must be positive")


@dataclass(frozen=True)
class AggSpec:
    """One window feature: ``out = func(column) OVER window``.

    ``params`` feed the kernel (e.g. ``(3,)`` for ``topn_frequency``'s N,
    a smoothing factor for ``ew_avg``); ``where`` restricts input rows
    (conditional aggregations such as ``avg_cate_where``).
    """

    func: str
    column: str
    window: str
    out: str
    params: tuple = ()
    where: Condition | None = None


@dataclass(frozen=True)
class LastJoinSpec:
    """LAST JOIN: attach the most recent matching tuple of a reference table.

    For each base row, find the row of ``table`` with equal ``key`` and the
    greatest ``ts_col`` not exceeding the base row's timestamp, and project
    ``select`` columns (renamed ``{table}_{col}``). Eliminates the
    rank-and-filter construction standard SQL needs (paper Section 4.1).
    """

    table: str
    key: str
    ts_col: str
    select: tuple[str, ...]

    def out_name(self, col: str) -> str:
        return f"{self.table}_{col}"


@dataclass(frozen=True)
class FeatureScript:
    """A deployable feature script (the unit Figure 3's modes share)."""

    base_table: str
    key_col: str
    ts_col: str
    windows: tuple[WindowSpec, ...]
    aggs: tuple[AggSpec, ...]
    last_joins: tuple[LastJoinSpec, ...] = ()

    def __post_init__(self) -> None:
        names = [w.name for w in self.windows]
        if len(names) != len(set(names)):
            raise ValueError("duplicate window names")
        wset = set(names)
        for a in self.aggs:
            if a.window not in wset:
                raise ValueError(f"agg {a.out!r} references unknown window {a.window!r}")
        outs = [a.out for a in self.aggs] + [
            j.out_name(c) for j in self.last_joins for c in j.select
        ]
        if len(outs) != len(set(outs)):
            raise ValueError("duplicate output feature names")

    @property
    def feature_names(self) -> list[str]:
        return [a.out for a in self.aggs] + [
            j.out_name(c) for j in self.last_joins for c in j.select
        ]
