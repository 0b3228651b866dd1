"""Benchmark: Figures 10/11 — request over a long window, raw scan vs
pre-aggregated hierarchy (the paper's headline 45x-class gap)."""
import pytest

from repro.bench.online_experiments import _load_engine, _requests
from repro.core.spec import AggSpec, FeatureScript, WindowSpec
from repro.online.engine import LongWindowConfig
from repro.synth_data import events_pdf

WINDOW_ROWS = 100_000


@pytest.fixture(scope="module")
def setup():
    n = WINDOW_ROWS + 1_000
    ev = events_pdf(n=n, n_users=1, span_ms=n * 10, seed=95)
    w = WindowSpec(
        name="lw", partition_by="userid", order_by="ts", range_ms=WINDOW_ROWS * 10
    )
    script = FeatureScript(
        "events", "userid", "ts", (w,),
        (
            AggSpec("sum", "price", "lw", "f_sum"),
            AggSpec("max", "price", "lw", "f_max"),
            AggSpec("count", "price", "lw", "f_cnt"),
        ),
    )
    req = _requests(ev, 1)[0]
    return ev, script, req


def test_long_window_raw_scan(benchmark, setup):
    ev, script, req = setup
    engine = _load_engine(script, ev, ev.iloc[:0])
    feats = benchmark.pedantic(
        lambda: engine.process_request(req, use_preagg=False), rounds=5, iterations=1
    )
    assert feats["f_cnt"] >= WINDOW_ROWS * 0.9


def test_long_window_preagg(benchmark, setup):
    ev, script, req = setup
    engine = _load_engine(
        script, ev, ev.iloc[:0],
        long_windows=(LongWindowConfig("lw", levels_ms=(1_000, 60_000, 3_600_000)),),
    )
    feats = benchmark(lambda: engine.process_request(req))
    assert feats["f_cnt"] >= WINDOW_ROWS * 0.9
