"""Online-side experiments: Figure 6 (online MicroBench), Table 3
(latency vs feature count), Figures 10/11 (pre-aggregation), Figures
15–17 (hyper-parameter sweeps).

Each experiment builds a deployed :class:`FeatureScript`, loads history
into the memtable store, and measures per-request latency/throughput of
the online engine against the baselines the paper used: DuckDB executing
an equivalent per-request analytical query, and a full-scan engine that
re-filters the entire table per request (the "reprocess entire datasets"
behaviour the paper ascribes to MySQL-in-mem/DuckDB).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.bench.harness import LatencyReport, measure_requests
from repro.core.spec import AggSpec, FeatureScript, LastJoinSpec, WindowSpec
from repro.online.engine import LongWindowConfig, OnlineEngine
from repro.online.memtable import MemTableStore
from repro.synth_data import events_pdf, orders_stream_pdf

_FUNC_CYCLE = ["sum", "avg", "min", "max", "count"]


def _microbench_script(n_windows: int = 2, n_joins: int = 1, *, rows: int | None = None,
                       range_ms: int = 30_000) -> FeatureScript:
    """The MicroBench script: windows over events (+ orders union) and
    LAST JOINs against the orders stream — three stream tables total."""
    windows = []
    aggs = []
    for i in range(n_windows):
        unions = ("orders",) if i == 0 else ()
        if rows is not None:
            w = WindowSpec(name=f"w{i}", partition_by="userid", order_by="ts", rows=rows, union_tables=unions)
        else:
            w = WindowSpec(
                name=f"w{i}", partition_by="userid", order_by="ts",
                range_ms=range_ms * (i + 1), union_tables=unions,
            )
        windows.append(w)
        for j, func in enumerate(_FUNC_CYCLE[:3]):
            aggs.append(AggSpec(func, "price", f"w{i}", f"f_{i}_{j}"))
    joins = tuple(
        LastJoinSpec("orders", "userid", "ts", (c,))
        for c in ["price", "quantity", "category", "etype"][:n_joins]
    )
    # LastJoinSpec output names collide if the same table/column repeats;
    # n_joins <= 4 distinct columns keeps them unique.
    return FeatureScript("events", "userid", "ts", tuple(windows), tuple(aggs), joins)


def _load_engine(script: FeatureScript, ev: pd.DataFrame, od: pd.DataFrame,
                 long_windows=()) -> OnlineEngine:
    store = MemTableStore()
    store.create_table("events", key_col="userid", ts_col="ts")
    store.create_table("orders", key_col="userid", ts_col="ts")
    engine = OnlineEngine(store, script, long_windows=tuple(long_windows))
    for r in ev.to_dict("records"):
        engine.insert("events", r)
    for r in od.to_dict("records"):
        engine.insert("orders", r)
    engine.catch_up()
    return engine


def _requests(ev: pd.DataFrame, n: int, seed: int = 97) -> list[dict]:
    """Request tuples that extend the stream past its end (fresh arrivals)."""
    g = np.random.default_rng(seed)
    t1 = int(ev["ts"].max())
    users = ev["userid"].unique()
    reqs = []
    for i in range(n):
        reqs.append(
            {
                "userid": int(g.choice(users)),
                "ts": t1 + 1 + i,
                "price": float(g.random() * 100),
                "quantity": int(g.integers(1, 5)),
                "category": "tech",
                "etype": "click",
            }
        )
    return reqs


# --- Figure 6: online MicroBench ---------------------------------------------


def _duckdb_request_engine(ev: pd.DataFrame, od: pd.DataFrame, script: FeatureScript):
    """Per-request DuckDB execution of the equivalent feature query —
    the paper's DuckDB baseline (an embedded analytical engine evaluating
    each request as an ad-hoc aggregation)."""
    import duckdb

    con = duckdb.connect()
    con.register("events", ev)
    con.register("orders", od)
    select_parts = []
    for a in script.aggs:
        w = next(w for w in script.windows if w.name == a.window)
        src = (
            "(SELECT price, ts FROM events WHERE userid = ? AND ts >= ? AND ts <= ? "
            " UNION ALL SELECT price, ts FROM orders WHERE userid = ? AND ts >= ? AND ts <= ?)"
            if w.union_tables
            else "(SELECT price, ts FROM events WHERE userid = ? AND ts >= ? AND ts <= ?)"
        )
        select_parts.append((a, w, src))

    def run(req: dict) -> dict:
        out = {}
        for a, w, src in select_parts:
            lo = req["ts"] - w.range_ms
            n_params = 6 if w.union_tables else 3
            params = [req["userid"], lo, req["ts"]] * (n_params // 3)
            val = con.execute(f"SELECT {a.func}(price) FROM {src} t", params).fetchone()[0]
            out[a.out] = val
        for j in script.last_joins:
            row = con.execute(
                f"SELECT {', '.join(j.select)} FROM {j.table} WHERE {j.key} = ? AND {j.ts_col} <= ? "
                f"ORDER BY {j.ts_col} DESC LIMIT 1",
                [req[j.key], req["ts"]],
            ).fetchone()
            for c, v in zip(j.select, row or [None] * len(j.select)):
                out[j.out_name(c)] = v
        return out

    return run


def _fullscan_request_engine(ev: pd.DataFrame, od: pd.DataFrame, script: FeatureScript):
    """Unindexed baseline: every request re-filters the whole table with
    boolean masks — no time index, no pre-ranking (the failure mode the
    paper ascribes to general-purpose stores)."""
    ev_u, ev_ts, ev_p = ev["userid"].to_numpy(), ev["ts"].to_numpy(), ev["price"].to_numpy()
    od_u, od_ts, od_p = od["userid"].to_numpy(), od["ts"].to_numpy(), od["price"].to_numpy()
    funcs = {"sum": np.sum, "avg": np.mean, "min": np.min, "max": np.max, "count": len}

    def run(req: dict) -> dict:
        out = {}
        for a in script.aggs:
            w = next(w for w in script.windows if w.name == a.window)
            lo = req["ts"] - w.range_ms
            m = (ev_u == req["userid"]) & (ev_ts >= lo) & (ev_ts <= req["ts"])
            vals = ev_p[m]
            if w.union_tables:
                mo = (od_u == req["userid"]) & (od_ts >= lo) & (od_ts <= req["ts"])
                vals = np.concatenate([vals, od_p[mo]])
            vals = np.append(vals, req["price"])
            out[a.out] = funcs[a.func](vals)
        for j in script.last_joins:
            m = (od_u == req["userid"]) & (od_ts <= req["ts"])
            idx = np.flatnonzero(m)
            hit = od.iloc[idx[od_ts[m].argmax()]] if len(idx) else None
            for c in j.select:
                out[j.out_name(c)] = hit[c] if hit is not None else None
        return out

    return run


def fig6_online_microbench(
    *, n_history: int = 30_000, n_users: int = 100, n_requests: int = 300
) -> list[dict]:
    """Latency + throughput of OpenMLDB-engine vs DuckDB vs full-scan."""
    span = 3_600_000
    ev = events_pdf(n=n_history, n_users=n_users, span_ms=span, seed=91)
    od = orders_stream_pdf(n=n_history // 2, n_users=n_users, span_ms=span, seed=92)
    script = _microbench_script(n_windows=2, n_joins=1)
    engine = _load_engine(script, ev, od)
    reqs = _requests(ev, n_requests)

    systems = {
        "OpenMLDB(ours)": lambda r: engine.process_request(r),
        "DuckDB": _duckdb_request_engine(ev, od, script),
        "FullScan(MySQL-like)": _fullscan_request_engine(ev, od, script),
    }
    rows = []
    for name, fn in systems.items():
        rep = measure_requests(fn, reqs)
        rows.append({"System": name, **rep.row()})
    return rows


# --- Table 3: latency vs number of features ----------------------------------


def _wide_events(n: int, n_cols: int, n_users: int = 50, seed: int = 93) -> pd.DataFrame:
    g = np.random.default_rng(seed)
    base = events_pdf(n=n, n_users=n_users, span_ms=600_000, seed=seed)
    data = {"userid": base["userid"], "ts": base["ts"]}
    for c in range(n_cols):
        data[f"c{c}"] = g.random(n) * 100
    return pd.DataFrame(data)


def table3_feature_scaling(
    *, configs=((10, 20), (100, 210), (1000, 2100)), n_history: int = 2_000,
    n_requests: int = 200,
) -> list[dict]:
    """TP50..TP999 request latency for growing (#columns, #features)."""
    rows = []
    for n_cols, n_features in configs:
        ev = _wide_events(n_history, n_cols)
        w_r = WindowSpec(name="wr", partition_by="userid", order_by="ts", range_ms=60_000)
        w_n = WindowSpec(name="wn", partition_by="userid", order_by="ts", rows=50)
        aggs = []
        for f in range(n_features):
            col = f"c{f % n_cols}"
            func = _FUNC_CYCLE[f % len(_FUNC_CYCLE)]
            win = "wr" if f % 2 == 0 else "wn"
            aggs.append(AggSpec(func, col, win, f"feat_{f}"))
        script = FeatureScript("events", "userid", "ts", (w_r, w_n), tuple(aggs))
        store = MemTableStore()
        store.create_table("events", key_col="userid", ts_col="ts")
        engine = OnlineEngine(store, script)
        for r in ev.to_dict("records"):
            engine.insert("events", r)
        g = np.random.default_rng(94)
        t1 = int(ev["ts"].max())
        reqs = []
        for i in range(n_requests):
            req = {"userid": int(g.choice(ev["userid"].unique())), "ts": t1 + 1 + i}
            for c in range(n_cols):
                req[f"c{c}"] = float(g.random() * 100)
            reqs.append(req)
        rep = measure_requests(lambda r: engine.process_request(r), reqs)
        rows.append({"#-Column": n_cols, "#-Feature": n_features, **rep.row()})
    return rows


# --- Figures 10/11: long-window pre-aggregation ------------------------------


def fig10_preagg(
    *, window_rows=(10_000, 50_000, 100_000, 200_000), n_requests: int = 20
) -> list[dict]:
    """Request latency with vs without pre-aggregation as the long window
    grows (paper sweeps 100K–5000K tuples; scaled 10x down for the
    in-process substrate — same shape: raw grows linearly, pre-agg flat)."""
    rows = []
    n = max(window_rows) + 1_000
    # One hot key so the window really contains `window_rows` tuples.
    ev = events_pdf(n=n, n_users=1, span_ms=n * 10, seed=95)
    gap_ms = 10  # events are ~1 per 10ms
    for wr in window_rows:
        range_ms = wr * gap_ms
        w = WindowSpec(name="lw", partition_by="userid", order_by="ts", range_ms=range_ms)
        script = FeatureScript(
            "events", "userid", "ts", (w,),
            (
                AggSpec("sum", "price", "lw", "f_sum"),
                AggSpec("max", "price", "lw", "f_max"),
                AggSpec("count", "price", "lw", "f_cnt"),
            ),
        )
        od = ev.iloc[:0]
        eng_raw = _load_engine(script, ev, od)
        eng_pre = _load_engine(
            script, ev, od,
            long_windows=(LongWindowConfig("lw", levels_ms=(1_000, 60_000, 3_600_000)),),
        )
        reqs = _requests(ev, n_requests)
        raw = measure_requests(lambda r: eng_raw.process_request(r, use_preagg=False), reqs)
        pre = measure_requests(lambda r: eng_pre.process_request(r), reqs)
        rows.append(
            {
                "WindowRows": wr,
                "Raw TP50 (ms)": round(raw.tp(50), 3),
                "PreAgg TP50 (ms)": round(pre.tp(50), 3),
                "Speedup": f"{raw.tp(50) / max(pre.tp(50), 1e-9):.1f}x",
                "Raw QPS": round(raw.qps, 1),
                "PreAgg QPS": round(pre.qps, 1),
            }
        )
    return rows


# --- Figures 15-17: hyper-parameter sweeps -----------------------------------


def fig15_17_hyperparams(*, n_history: int = 20_000, n_users: int = 50,
                         n_requests: int = 200) -> dict[str, list[dict]]:
    """Latency/throughput vs #windows, window size (rows), #LAST JOINs."""
    span = 1_800_000
    ev = events_pdf(n=n_history, n_users=n_users, span_ms=span, seed=96)
    od = orders_stream_pdf(n=n_history // 2, n_users=n_users, span_ms=span, seed=97)

    def run(script: FeatureScript) -> LatencyReport:
        engine = _load_engine(script, ev, od)
        return measure_requests(lambda r: engine.process_request(r), _requests(ev, n_requests))

    out: dict[str, list[dict]] = {"windows": [], "window_rows": [], "joins": []}
    for n_w in (1, 2, 4, 8):
        rep = run(_microbench_script(n_windows=n_w, n_joins=0, range_ms=10_000))
        out["windows"].append({"#-Windows": n_w, **rep.row()})
    for rows_ in (10, 100, 500, 1_000):
        rep = run(_microbench_script(n_windows=2, n_joins=0, rows=rows_))
        out["window_rows"].append({"RowsPerWindow": rows_, **rep.row()})
    for n_j in (0, 1, 2, 4):
        rep = run(_microbench_script(n_windows=1, n_joins=n_j, range_ms=10_000))
        out["joins"].append({"#-LastJoins": n_j, **rep.row()})
    return out
