"""Online real-time execution engine (paper Sections 3.2 and 5).

:class:`OnlineEngine` executes a compiled feature script in **online
request mode**: each request tuple is *virtually inserted* into its base
table — it participates in its own windows — the deployed plan runs over
the memtable store, and one feature row comes back. The same shared
kernels the offline Spark path calls are invoked here, which is what
makes the two modes consistent.

Per physical window the engine gathers the frame from the two-layer
memtable (O(log keys) to locate the key, then a head-forward scan of
exactly the frame rows — the pre-ranked structure of Section 7.2), or,
for windows registered as *long windows*, answers from the
:class:`~repro.online.preagg.MultiLevelAggregator` instead of scanning
raw rows. LAST JOINs resolve via the memtable's latest-before lookup.

:func:`replay_consistency` replays historical tables through the engine
in arrival order — the harness behind the offline/online consistency
tests and the Figure 6 / Table 3 benchmarks.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Any

import numpy as np
import pandas as pd

from repro.core.kernels import (
    eval_aggs,
    finalize_state,
    merge_states,
    partial_state,
)
from repro.core.plan import CompiledPlan, compile_script
from repro.core.spec import FeatureScript, WindowSpec
from repro.online.memtable import MemTableStore
from repro.online.preagg import MultiLevelAggregator


@dataclass(frozen=True)
class LongWindowConfig:
    """deploy ... OPTIONS(long_windows="w:granularities") equivalent."""

    window: str
    levels_ms: tuple[int, ...] = (1_000, 60_000, 3_600_000)


class OnlineEngine:
    """Request-mode executor for one deployed feature script."""

    def __init__(
        self,
        store: MemTableStore,
        script: FeatureScript,
        *,
        long_windows: tuple[LongWindowConfig, ...] = (),
    ) -> None:
        self.store = store
        self.script = script
        self.plan: CompiledPlan = compile_script(script)
        # Compile-time index optimization (Section 4.2): every window
        # partition key and LAST JOIN key gets a memtable index.
        for w in self.plan.physical_windows:
            store[script.base_table].ensure_index(w.partition_by)
            for u in w.union_tables:
                store[u].ensure_index(w.partition_by)
        for j in script.last_joins:
            store[j.table].ensure_index(j.key)
        self._aggregators: dict[tuple[str, str], MultiLevelAggregator] = {}
        self._long_windows: dict[str, LongWindowConfig] = {}
        for cfg in long_windows:
            canon = self.plan.window_alias[cfg.window]
            w = self._window(canon)
            if w.range_ms is None:
                raise ValueError("long-window pre-aggregation needs a RANGE frame")
            if w.union_tables:
                raise ValueError("pre-aggregation applies to single-table windows")
            self._long_windows[canon] = cfg
            for a in self.plan.agg_groups[canon]:
                cat = str(a.params[0]) if a.func == "avg_cate" else None
                if a.where is not None:
                    raise ValueError("conditional aggregates use the raw path")
                # Non-decomposable aggregates (ew_avg) raise here — the
                # deployment must keep them on the raw path.
                self._aggregators[(canon, a.out)] = MultiLevelAggregator(
                    store[script.base_table],
                    func=a.func,
                    column=a.column,
                    cat_column=cat,
                    levels_ms=cfg.levels_ms,
                )

    def _window(self, name: str) -> WindowSpec:
        for w in self.plan.physical_windows:
            if w.name == name:
                return w
        raise KeyError(name)

    # -- data path ------------------------------------------------------------

    def insert(self, table: str, row: dict) -> None:
        """Ingest one stream tuple (binlog append; aggregators lag until
        :meth:`catch_up`, modelling the asynchronous update pipeline)."""
        self.store[table].put(row)

    def catch_up(self) -> int:
        """Drive all pre-aggregators to the binlog head (async upkeep)."""
        return sum(agg.catch_up() for agg in self._aggregators.values())

    # -- request mode ---------------------------------------------------------

    def process_request(self, request: dict, *, use_preagg: bool = True) -> dict[str, Any]:
        """Compute the deployed script's features for one request tuple."""
        s = self.script
        cur_ts = int(request[s.ts_col])
        features: dict[str, Any] = {}
        for w in self.plan.physical_windows:
            aggs = list(self.plan.agg_groups[w.name])
            if not aggs:
                continue
            key = request[w.partition_by]
            if use_preagg and w.name in self._long_windows:
                self.catch_up()
                lo = cur_ts - w.range_ms
                for a in aggs:
                    agg = self._aggregators[(w.name, a.out)]
                    # Merge stored-range state with the virtually inserted
                    # request row (ordered: history first, request last).
                    hist = agg.query(key, lo, cur_ts - 1)
                    cat = (
                        np.asarray([request[agg.cat_column]])
                        if agg.cat_column
                        else None
                    )
                    cur = partial_state(a.func, np.asarray([request[a.column]]), cat)
                    features[a.out] = finalize_state(
                        a.func, merge_states(a.func, hist, cur), a.params
                    )
                continue
            frame = self._gather_frame(w, key, cur_ts, request)
            features.update(eval_aggs(frame, aggs))
        for j in s.last_joins:
            hit = self.store[j.table].latest_before(request[j.key], cur_ts, index_col=j.key)
            for c in j.select:
                features[j.out_name(c)] = hit[c] if hit is not None else None
        return features

    def _gather_frame(
        self, w: WindowSpec, key: Any, cur_ts: int, request: dict
    ) -> dict[str, np.ndarray]:
        """Collect the window frame, oldest-first, request row last.

        Stored base rows qualify with ts < cur_ts; unioned rows with
        ts <= cur_ts — identical to the offline executor's tie-break.
        """
        if w.range_ms is not None:
            lo = cur_ts - w.range_ms
            rows: list[tuple] = []  # (ts, flag, seq, row) sort key
            base_rows = self.store[self.script.base_table].scan_window(
                key, lo - 1, cur_ts, index_col=w.partition_by
            )
            n_unions = len(w.union_tables)
            for seq, r in enumerate(reversed(base_rows)):  # oldest-first
                if int(r[self.script.ts_col]) < cur_ts:
                    rows.append((int(r[w.order_by]), n_unions, seq, r))
            for ordinal, uname in enumerate(w.union_tables):
                urows = self.store[uname].scan_window(key, lo - 1, cur_ts, index_col=w.partition_by)
                for seq, r in enumerate(reversed(urows)):
                    rows.append((int(r[w.order_by]), ordinal, seq, r))
            rows.sort(key=lambda t: (t[0], t[1], t[2]))
            selected = [r for _, _, _, r in rows] + [request]
        else:
            n_unions = len(w.union_tables)
            cand: list[tuple] = []
            base_rows = self.store[self.script.base_table].scan_window(
                key, -1, cur_ts, index_col=w.partition_by
            )
            for seq, r in enumerate(reversed(base_rows)):
                if int(r[self.script.ts_col]) < cur_ts:
                    cand.append((int(r[w.order_by]), n_unions, seq, r))
            for ordinal, uname in enumerate(w.union_tables):
                urows = self.store[uname].scan_window(key, -1, cur_ts, index_col=w.partition_by)
                for seq, r in enumerate(reversed(urows)):
                    cand.append((int(r[w.order_by]), ordinal, seq, r))
            cand.sort(key=lambda t: (t[0], t[1], t[2]))
            selected = [r for _, _, _, r in cand[-(w.rows - 1) :] ] if w.rows > 1 else []
            selected = selected + [request]
        cols_needed = set()
        for a in self.plan.agg_groups[w.name]:
            cols_needed.add(a.column)
            if a.where is not None:
                cols_needed.add(a.where.col)
            if a.func == "avg_cate":
                cols_needed.add(str(a.params[0]))
        return {c: np.asarray([r[c] for r in selected]) for c in cols_needed}


def replay_consistency(
    engine: OnlineEngine,
    base_pdf: pd.DataFrame,
    union_pdfs: dict[str, pd.DataFrame],
    *,
    use_preagg: bool = True,
) -> pd.DataFrame:
    """Replay history through request mode, reproducing the offline result.

    All tuples (base + unioned tables) are processed in global
    (ts, table-ordinal) order — unions before base on timestamp ties, the
    same total order the offline executor sorts by. Each base tuple is
    first answered as a request (virtual insert), then stored. Returns one
    feature row per base tuple, in base-table order.
    """
    s = engine.script
    union_order = {}
    for w in engine.plan.physical_windows:
        for ordinal, u in enumerate(w.union_tables):
            union_order.setdefault(u, ordinal)
    n_unions = max([o + 1 for o in union_order.values()], default=0)

    stream: list[tuple[int, int, int, str, dict]] = []
    for i, row in enumerate(base_pdf.to_dict("records")):
        stream.append((int(row[s.ts_col]), n_unions, i, s.base_table, row))
    for uname, updf in union_pdfs.items():
        ordinal = union_order.get(uname, 0)
        for i, row in enumerate(updf.to_dict("records")):
            stream.append((int(row[s.ts_col]), ordinal, i, uname, row))
    stream.sort(key=lambda t: (t[0], t[1], t[2]))

    out: list[dict] = []
    for ts, ordinal, _, table, row in stream:
        if table == s.base_table:
            feats = engine.process_request(row, use_preagg=use_preagg)
            feats[s.ts_col] = ts
            out.append(feats)
            engine.insert(s.base_table, row)
        else:
            engine.insert(table, row)
    out_pdf = pd.DataFrame(out).sort_values(s.ts_col, kind="mergesort").reset_index(drop=True)
    return out_pdf
