"""Benchmark: Figure 6 — per-request latency of the three online systems
over the MicroBench script (2 windows incl. a WINDOW UNION + LAST JOIN).
"""
import pytest

from repro.bench.online_experiments import (
    _duckdb_request_engine,
    _fullscan_request_engine,
    _load_engine,
    _microbench_script,
    _requests,
)
from repro.synth_data import events_pdf, orders_stream_pdf


@pytest.fixture(scope="module")
def setup():
    span = 3_600_000
    ev = events_pdf(n=30_000, n_users=100, span_ms=span, seed=91)
    od = orders_stream_pdf(n=15_000, n_users=100, span_ms=span, seed=92)
    script = _microbench_script(n_windows=2, n_joins=1)
    req = _requests(ev, 1)[0]
    return ev, od, script, req


def test_openmldb_engine_request(benchmark, setup):
    ev, od, script, req = setup
    engine = _load_engine(script, ev, od)
    feats = benchmark(lambda: engine.process_request(req))
    assert "f_0_0" in feats


def test_duckdb_request(benchmark, setup):
    ev, od, script, req = setup
    run = _duckdb_request_engine(ev, od, script)
    feats = benchmark(lambda: run(req))
    assert "f_0_0" in feats


def test_fullscan_request(benchmark, setup):
    ev, od, script, req = setup
    run = _fullscan_request_engine(ev, od, script)
    feats = benchmark(lambda: run(req))
    assert "f_0_0" in feats
