"""Independent reference implementations used by the test-suite.

``brute_force_features`` recomputes a FeatureScript with plain pandas
filtering and hand-rolled aggregate formulas — a deliberately different
code path from ``repro.core.kernels`` — so a kernel bug cannot hide
behind "both sides call the same code".
"""
from __future__ import annotations

from collections import Counter

import numpy as np
import pandas as pd

from repro.core.spec import AggSpec, FeatureScript


def _ref_agg(a: AggSpec, frame: pd.DataFrame):
    """Hand-rolled aggregate over one window frame (oldest-first rows)."""
    sub = frame
    if a.where is not None:
        op = a.where.op
        col = sub[a.where.col]
        mask = {
            ">": col > a.where.value,
            ">=": col >= a.where.value,
            "<": col < a.where.value,
            "<=": col <= a.where.value,
            "==": col == a.where.value,
            "!=": col != a.where.value,
        }[op]
        sub = sub[mask]
    v = sub[a.column]
    if a.func == "sum":
        return float(v.sum())
    if a.func == "count":
        return int(len(v))
    if a.func == "min":
        return float(v.min()) if len(v) else None
    if a.func == "max":
        return float(v.max()) if len(v) else None
    if a.func == "avg":
        return float(v.mean()) if len(v) else None
    if a.func == "distinct_count":
        return int(v.nunique())
    if a.func == "topn_frequency":
        cnt = Counter(v.tolist())
        top = sorted(cnt.items(), key=lambda kv: (-kv[1], str(kv[0])))[: int(a.params[0])]
        return ",".join(str(k) for k, _ in top)
    if a.func == "drawdown":
        if len(v) == 0:
            return None
        vals = v.to_numpy(dtype="float64")
        peak, worst = -np.inf, 0.0
        for x in vals:
            peak = max(peak, x)
            if peak > 0:
                worst = max(worst, (peak - x) / peak)
        return float(worst)
    if a.func == "ew_avg":
        if len(v) == 0:
            return None
        alpha = float(a.params[0])
        vals = v.to_numpy(dtype="float64")
        num = den = 0.0
        for i, x in enumerate(vals):
            w = (1.0 - alpha) ** (len(vals) - 1 - i)
            num += w * x
            den += w
        return num / den
    if a.func == "avg_cate":
        cats = sub[str(a.params[0])].astype(str)
        groups: dict[str, list[float]] = {}
        for c, x in zip(cats.tolist(), v.tolist()):
            groups.setdefault(c, []).append(float(x))
        return ",".join(f"{c}:{np.mean(groups[c]):.6f}" for c in sorted(groups))
    raise ValueError(a.func)


def brute_force_features(
    base_pdf: pd.DataFrame,
    union_pdfs: dict[str, pd.DataFrame],
    script: FeatureScript,
) -> pd.DataFrame:
    """Per-base-row feature frame computed by brute-force filtering.

    Frame semantics match DESIGN.md: base rows qualify with ts < cur (or
    self), unioned rows with ts <= cur; ROWS frames keep the latest k of
    the candidate set. Output rows follow base_pdf order.
    """
    ts_col = script.ts_col
    out_rows = []
    windows = {w.name: w for w in script.windows}
    for _, cur in base_pdf.iterrows():
        feats = {}
        for a in script.aggs:
            w = windows[a.window]
            key = cur[w.partition_by]
            cur_ts = int(cur[w.order_by])
            cands = []
            b = base_pdf[(base_pdf[w.partition_by] == key) & (base_pdf[w.order_by] < cur_ts)]
            for _, r in b.iterrows():
                cands.append((int(r[w.order_by]), 10**9, r))
            for ordinal, uname in enumerate(w.union_tables):
                u = union_pdfs[uname]
                uu = u[(u[w.partition_by] == key) & (u[w.order_by] <= cur_ts)]
                for _, r in uu.iterrows():
                    cands.append((int(r[w.order_by]), ordinal, r))
            cands.append((cur_ts, 10**9, cur))
            cands.sort(key=lambda t: (t[0], t[1]))
            if w.range_ms is not None:
                lo = cur_ts - w.range_ms
                rows = [r for t, _, r in cands if t >= lo]
            else:
                rows = [r for _, _, r in cands][-w.rows :]
            frame = pd.DataFrame(rows).reset_index(drop=True)
            feats[a.out] = _ref_agg(a, frame)
        for j in script.last_joins:
            ref = union_pdfs[j.table]
            hit = ref[(ref[j.key] == cur[j.key]) & (ref[j.ts_col] <= int(cur[ts_col]))]
            if hit.empty:
                for c in j.select:
                    feats[j.out_name(c)] = None
            else:
                best = hit.sort_values(j.ts_col).iloc[-1]
                for c in j.select:
                    feats[j.out_name(c)] = best[c]
        out_rows.append(feats)
    return pd.DataFrame(out_rows)
