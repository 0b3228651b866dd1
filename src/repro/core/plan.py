"""Unified query plan generator (paper Section 4).

``compile_script`` turns a :class:`FeatureScript` into a
:class:`CompiledPlan` exactly once per distinct script, applying the
paper's compilation-level optimizations:

* **Parsing optimization / window merging** — windows whose
  (partition, order, frame, unions) template is identical are merged into
  one physical window; all their aggregates evaluate over the single
  merged scan.
* **Compilation cache** — scripts are frozen/hashable; recompiling an
  identical script returns the cached plan (``CACHE_STATS`` exposes
  hit/compile counters, pinned by tests).
* **Cycle binding** — inherited from ``repro.core.kernels.eval_aggs``:
  shared base states (sum/count/...) are computed once per merged window.

The plan has two executions over the *same* kernels: :meth:`offline`
(Spark batch over historical tables, per Figure 3's offline mode) and the
online request mode, which ``repro.online.engine.OnlineEngine`` drives
with this plan. Consistency between the two is a theorem of construction
— one kernel implementation — and is verified end-to-end by
``tests/test_consistency.py``.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.last_join import last_join
from repro.core.spec import AggSpec, FeatureScript, WindowSpec
from repro.offline.windows import IDX_COL, add_index_column, compute_window_features


@dataclass
class CacheStats:
    """Counters for the compilation cache (Section 4.2)."""

    compiles: int = 0
    hits: int = 0

    def reset(self) -> None:
        self.compiles = 0
        self.hits = 0


CACHE_STATS = CacheStats()
_PLAN_CACHE: dict[FeatureScript, "CompiledPlan"] = {}


def _window_template(w: WindowSpec) -> tuple:
    """The merge key: everything but the name."""
    return (w.partition_by, w.order_by, w.range_ms, w.rows, w.union_tables)


@dataclass(frozen=True)
class CompiledPlan:
    """A compiled feature script: merged physical windows + routed aggregates."""

    script: FeatureScript
    #: canonical (merged) physical windows, keyed by canonical name.
    physical_windows: tuple[WindowSpec, ...]
    #: original window name -> canonical window name.
    window_alias: dict[str, str] = field(hash=False, compare=False, default_factory=dict)
    #: canonical window name -> aggregates evaluated on it.
    agg_groups: dict[str, tuple[AggSpec, ...]] = field(
        hash=False, compare=False, default_factory=dict
    )

    @property
    def n_physical_windows(self) -> int:
        return len(self.physical_windows)

    def offline(
        self,
        tables: dict[str, DataFrame],
        *,
        parallel: bool = False,
    ) -> DataFrame:
        """Batch execution: features for every row of the base table.

        Output = base columns + features in ``script.feature_names`` order.
        ``parallel=True`` materializes the per-window branches concurrently
        (Section 6.1) via ``repro.offline.multi_window``; the default single
        action lets Catalyst schedule the DAG.
        """
        s = self.script
        base = tables[s.base_table]
        base_idx = add_index_column(base, s.ts_col)
        branches = [
            (
                w,
                compute_window_features(
                    base_idx,
                    {u: tables[u] for u in w.union_tables},
                    w,
                    list(self.agg_groups[w.name]),
                ),
            )
            for w in self.physical_windows
        ]
        if parallel:
            from repro.offline.multi_window import materialize_parallel

            branches = [(w, df) for (w, _), df in zip(branches, materialize_parallel([d for _, d in branches]))]
        result = base_idx
        for _, fdf in branches:
            # Concat Join (Section 6.1): align on the unique index column.
            result = result.join(fdf, on=IDX_COL, how="left")
        for j in s.last_joins:
            result = last_join(
                result,
                tables[j.table],
                key=j.key,
                base_ts=s.ts_col,
                ref_ts=j.ts_col,
                select=list(j.select),
                prefix=j.table,
            )
        base_cols = [f.name for f in base.schema.fields]
        return result.select(*base_cols, *s.feature_names)

    def aggs_for(self, original_window: str) -> tuple[AggSpec, ...]:
        """Aggregates routed to the physical window behind ``original_window``."""
        return self.agg_groups[self.window_alias[original_window]]


def compile_script(script: FeatureScript) -> CompiledPlan:
    """Compile (or fetch from the compilation cache) a feature script."""
    cached = _PLAN_CACHE.get(script)
    if cached is not None:
        CACHE_STATS.hits += 1
        return cached
    CACHE_STATS.compiles += 1

    canonical: dict[tuple, WindowSpec] = {}
    alias: dict[str, str] = {}
    for w in script.windows:
        t = _window_template(w)
        if t not in canonical:
            canonical[t] = w
        alias[w.name] = canonical[t].name
    groups: dict[str, list[AggSpec]] = {w.name: [] for w in canonical.values()}
    for a in script.aggs:
        groups[alias[a.window]].append(a)
    plan = CompiledPlan(
        script=script,
        physical_windows=tuple(canonical.values()),
        window_alias=alias,
        agg_groups={k: tuple(v) for k, v in groups.items()},
    )
    _PLAN_CACHE[script] = plan
    return plan


def clear_cache() -> None:
    """Test hook: drop all cached plans and reset counters."""
    _PLAN_CACHE.clear()
    CACHE_STATS.reset()
