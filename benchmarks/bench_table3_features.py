"""Benchmark: Table 3 — online request latency vs feature count.

One benchmark per paper row; pytest-benchmark's per-round stats are the
latency distribution the paper reports as TP50..TP999.
"""
import numpy as np
import pytest

from repro.bench.online_experiments import _wide_events
from repro.core.spec import AggSpec, FeatureScript, WindowSpec
from repro.online.engine import OnlineEngine
from repro.online.memtable import MemTableStore

_FUNC_CYCLE = ["sum", "avg", "min", "max", "count"]


def _engine_and_request(n_cols: int, n_features: int):
    ev = _wide_events(2_000, n_cols)
    w_r = WindowSpec(name="wr", partition_by="userid", order_by="ts", range_ms=60_000)
    w_n = WindowSpec(name="wn", partition_by="userid", order_by="ts", rows=50)
    aggs = tuple(
        AggSpec(
            _FUNC_CYCLE[f % len(_FUNC_CYCLE)],
            f"c{f % n_cols}",
            "wr" if f % 2 == 0 else "wn",
            f"feat_{f}",
        )
        for f in range(n_features)
    )
    script = FeatureScript("events", "userid", "ts", (w_r, w_n), aggs)
    store = MemTableStore()
    store.create_table("events", key_col="userid", ts_col="ts")
    engine = OnlineEngine(store, script)
    for r in ev.to_dict("records"):
        engine.insert("events", r)
    g = np.random.default_rng(7)
    req = {"userid": int(ev["userid"].iloc[0]), "ts": int(ev["ts"].max()) + 1}
    for c in range(n_cols):
        req[f"c{c}"] = float(g.random() * 100)
    return engine, req


@pytest.mark.parametrize("n_cols,n_features", [(10, 20), (100, 210), (1000, 2100)])
def test_request_latency_by_feature_count(benchmark, n_cols, n_features):
    engine, req = _engine_and_request(n_cols, n_features)
    feats = benchmark(lambda: engine.process_request(req))
    assert len(feats) == n_features
