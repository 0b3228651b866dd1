"""Shared aggregation kernels — the reproduction's "C++ library functions".

Both execution engines call exactly these functions: the offline Spark
path from inside ``applyInPandas`` workers, the online request path from
the in-process engine. That sharing *is* the paper's consistency
mechanism (Section 4.1/4.2): there is one implementation per aggregate,
so offline and online can not drift.

Two evaluation styles are provided:

* :func:`eval_aggs` — evaluate a list of aggregates over one window
  instance with **cycle binding** (Section 4.2): base states (sum, count,
  min, max, ...) are computed once per (column, filter) pair and reused by
  every aggregate that needs them (``avg`` reuses ``sum``+``count``).
* decomposable partial states — :func:`partial_state` /
  :func:`merge_states` / :func:`finalize_state` — used by the long-window
  pre-aggregators (Section 5.1) and the streaming job. ``merge_states``
  is *ordered* (left operand earlier in time), which is what makes
  ``drawdown`` decomposable. ``ew_avg`` is position-dependent and is
  deliberately **not** decomposable; the pre-aggregator refuses it.

Window-instance inputs arrive as a column dict ``{name: np.ndarray}``
ordered **ascending in time** (oldest first); order-sensitive kernels
rely on that convention.
"""
from __future__ import annotations

from collections import Counter
from typing import Any, Callable

import numpy as np

from repro.core.spec import AggSpec, Condition

# --- condition masks ---------------------------------------------------------

_OP_FN: dict[str, Callable[[np.ndarray, float], np.ndarray]] = {
    ">": lambda a, v: a > v,
    ">=": lambda a, v: a >= v,
    "<": lambda a, v: a < v,
    "<=": lambda a, v: a <= v,
    "==": lambda a, v: a == v,
    "!=": lambda a, v: a != v,
}


def condition_mask(cols: dict[str, np.ndarray], cond: Condition | None, n: int) -> np.ndarray | None:
    """Boolean mask for ``cond`` over the window's rows (None = all rows)."""
    if cond is None:
        return None
    return _OP_FN[cond.op](np.asarray(cols[cond.col]), cond.value)


# --- base states (cycle binding) ---------------------------------------------

#: base-state name -> computation over a (possibly filtered) value array.
_BASE_STATE_FN: dict[str, Callable[[np.ndarray], Any]] = {
    "sum": lambda v: float(np.sum(v)) if len(v) else 0.0,
    "count": lambda v: int(len(v)),
    "min": lambda v: float(np.min(v)) if len(v) else None,
    "max": lambda v: float(np.max(v)) if len(v) else None,
    "distinct": lambda v: set(v.tolist()),
    "counter": lambda v: Counter(v.tolist()),
    "values": lambda v: v,  # ordered raw values (order-sensitive kernels)
}

#: aggregate name -> base states it needs. ``avg`` shares sum+count with
#: plain ``sum``/``count`` aggregates over the same column — the cyclic
#: binding of Section 4.2.
AGG_BASE_STATES: dict[str, tuple[str, ...]] = {
    "sum": ("sum",),
    "count": ("count",),
    "min": ("min",),
    "max": ("max",),
    "avg": ("sum", "count"),
    "distinct_count": ("distinct",),
    "topn_frequency": ("counter",),
    "drawdown": ("values",),
    "ew_avg": ("values",),
    "avg_cate": ("values",),  # paired with the category column, see below
}

#: aggregates whose second input is a category column (value parsed from
#: "category:value" strings or taken from params[0] as the category col).
CATEGORICAL_AGGS = {"avg_cate"}


def _finalize_drawdown(values: np.ndarray) -> float | None:
    if len(values) == 0:
        return None
    v = np.asarray(values, dtype="float64")
    peaks = np.maximum.accumulate(v)
    with np.errstate(divide="ignore", invalid="ignore"):
        dd = np.where(peaks > 0, (peaks - v) / peaks, 0.0)
    return float(np.max(dd))


def _finalize_ew_avg(values: np.ndarray, alpha: float) -> float | None:
    if len(values) == 0:
        return None
    v = np.asarray(values, dtype="float64")
    n = len(v)
    # Oldest-first input; weight (1-alpha)^(n-1-i) gives the newest value
    # weight 1 — pandas ewm(adjust=True) semantics.
    w = (1.0 - alpha) ** np.arange(n - 1, -1, -1, dtype="float64")
    return float(np.dot(w, v) / w.sum())


def _finalize_topn(counter: Counter, n: int) -> str:
    # Frequency descending, key ascending for ties; comma-joined so the
    # output stays a scalar (oracle-comparable) column.
    top = sorted(counter.items(), key=lambda kv: (-kv[1], str(kv[0])))[:n]
    return ",".join(str(k) for k, _ in top)


def _finalize_avg_cate(values: np.ndarray, cats: np.ndarray) -> str:
    sums: dict[str, list[float]] = {}
    for c, v in zip(cats.tolist(), np.asarray(values, dtype="float64").tolist()):
        s = sums.setdefault(str(c), [0.0, 0])
        s[0] += v
        s[1] += 1
    parts = [f"{c}:{sums[c][0] / sums[c][1]:.6f}" for c in sorted(sums)]
    return ",".join(parts)


def eval_aggs(
    cols: dict[str, np.ndarray],
    aggs: list[AggSpec],
    *,
    state_counter: dict | None = None,
) -> dict[str, Any]:
    """Evaluate ``aggs`` over one window instance with base-state sharing.

    ``cols`` maps column name to an array ordered oldest-first. When
    ``state_counter`` (a dict) is passed, each base-state computation
    increments ``state_counter[(col, cond, state)]`` — tests use this to
    prove cycle binding computes shared states exactly once.
    """
    n = len(next(iter(cols.values()))) if cols else 0
    cache: dict[tuple, Any] = {}

    def base(colname: str, cond: Condition | None, state: str) -> Any:
        key = (colname, cond, state)
        if key not in cache:
            arr = np.asarray(cols[colname])
            mask = condition_mask(cols, cond, n)
            if mask is not None:
                arr = arr[mask]
            cache[key] = _BASE_STATE_FN[state](arr)
            if state_counter is not None:
                state_counter[key] = state_counter.get(key, 0) + 1
        return cache[key]

    out: dict[str, Any] = {}
    for a in aggs:
        f = a.func
        if f not in AGG_BASE_STATES:
            raise ValueError(f"unknown aggregate {f!r}")
        if f == "sum":
            out[a.out] = base(a.column, a.where, "sum")
        elif f == "count":
            out[a.out] = base(a.column, a.where, "count")
        elif f == "min":
            out[a.out] = base(a.column, a.where, "min")
        elif f == "max":
            out[a.out] = base(a.column, a.where, "max")
        elif f == "avg":
            s, c = base(a.column, a.where, "sum"), base(a.column, a.where, "count")
            out[a.out] = s / c if c else None
        elif f == "distinct_count":
            out[a.out] = len(base(a.column, a.where, "distinct"))
        elif f == "topn_frequency":
            out[a.out] = _finalize_topn(base(a.column, a.where, "counter"), int(a.params[0]))
        elif f == "drawdown":
            out[a.out] = _finalize_drawdown(base(a.column, a.where, "values"))
        elif f == "ew_avg":
            out[a.out] = _finalize_ew_avg(base(a.column, a.where, "values"), float(a.params[0]))
        elif f == "avg_cate":
            cat_col = str(a.params[0])
            vals = np.asarray(cols[a.column])
            cats = np.asarray(cols[cat_col])
            mask = condition_mask(cols, a.where, n)
            if mask is not None:
                vals, cats = vals[mask], cats[mask]
            out[a.out] = _finalize_avg_cate(vals, cats)
    return out


# --- decomposable partial states (pre-aggregation) ---------------------------

#: aggregates with ordered-mergeable partial states (pre-agg eligible).
DECOMPOSABLE = {
    "sum",
    "count",
    "min",
    "max",
    "avg",
    "distinct_count",
    "topn_frequency",
    "drawdown",
    "avg_cate",
}


def partial_state(func: str, values: np.ndarray, cats: np.ndarray | None = None) -> Any:
    """Partial state for ``func`` over an oldest-first chunk of values."""
    v = np.asarray(values)
    if func == "sum":
        return float(np.sum(v)) if len(v) else 0.0
    if func == "count":
        return int(len(v))
    if func == "min":
        return float(np.min(v)) if len(v) else None
    if func == "max":
        return float(np.max(v)) if len(v) else None
    if func == "avg":
        return (float(np.sum(v)) if len(v) else 0.0, int(len(v)))
    if func == "distinct_count":
        return set(v.tolist())
    if func == "topn_frequency":
        return Counter(v.tolist())
    if func == "drawdown":
        if len(v) == 0:
            return None
        fv = np.asarray(v, dtype="float64")
        return (float(np.max(fv)), float(np.min(fv)), _finalize_drawdown(fv))
    if func == "avg_cate":
        assert cats is not None
        state: dict[str, list] = {}
        for c, x in zip(np.asarray(cats).tolist(), np.asarray(v, dtype="float64").tolist()):
            s = state.setdefault(str(c), [0.0, 0])
            s[0] += x
            s[1] += 1
        return state
    raise ValueError(f"{func!r} is not decomposable (pre-agg ineligible)")


def merge_states(func: str, left: Any, right: Any) -> Any:
    """Merge two partial states; ``left`` covers the earlier time range."""
    if func == "sum":
        return left + right
    if func == "count":
        return left + right
    if func in ("min", "max"):
        if left is None:
            return right
        if right is None:
            return left
        return min(left, right) if func == "min" else max(left, right)
    if func == "avg":
        return (left[0] + right[0], left[1] + right[1])
    if func == "distinct_count":
        return left | right
    if func == "topn_frequency":
        return left + right
    if func == "drawdown":
        if left is None:
            return right
        if right is None:
            return left
        lpeak, lmin, ldd = left
        rpeak, rmin, rdd = right
        cross = (lpeak - rmin) / lpeak if lpeak > 0 else 0.0
        return (max(lpeak, rpeak), min(lmin, rmin), max(ldd, rdd, cross))
    if func == "avg_cate":
        out = {c: list(s) for c, s in left.items()}
        for c, s in right.items():
            t = out.setdefault(c, [0.0, 0])
            t[0] += s[0]
            t[1] += s[1]
        return out
    raise ValueError(f"{func!r} is not decomposable")


def finalize_state(func: str, state: Any, params: tuple = ()) -> Any:
    """Turn a (merged) partial state into the aggregate's output value."""
    if func in ("sum", "count", "min", "max"):
        return state
    if func == "avg":
        s, c = state
        return s / c if c else None
    if func == "distinct_count":
        return len(state)
    if func == "topn_frequency":
        return _finalize_topn(state, int(params[0]))
    if func == "drawdown":
        return None if state is None else state[2]
    if func == "avg_cate":
        parts = [f"{c}:{state[c][0] / state[c][1]:.6f}" for c in sorted(state)]
        return ",".join(parts)
    raise ValueError(f"{func!r} is not decomposable")


#: aggregates supporting O(1) subtract-and-evict (invertible states) —
#: Section 5.2's incremental computation.
INVERTIBLE = {"sum", "count", "avg"}


def subtract_value(func: str, state: Any, value: float) -> Any:
    """Remove one evicted value from an invertible running state."""
    if func == "sum":
        return state - value
    if func == "count":
        return state - 1
    if func == "avg":
        return (state[0] - value, state[1] - 1)
    raise ValueError(f"{func!r} is not invertible — use recompute")


def add_value(func: str, state: Any, value: float) -> Any:
    """Fold one arriving value into an invertible running state."""
    if func == "sum":
        return state + value
    if func == "count":
        return state + 1
    if func == "avg":
        return (state[0] + value, state[1] + 1)
    raise ValueError(f"{func!r} is not invertible")
