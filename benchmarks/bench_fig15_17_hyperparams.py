"""Benchmark: Figures 15–17 — request latency vs #windows, rows per
window, and #LAST JOINs on the online engine."""
import pytest

from repro.bench.online_experiments import (
    _load_engine,
    _microbench_script,
    _requests,
)
from repro.synth_data import events_pdf, orders_stream_pdf

SPAN = 1_800_000


@pytest.fixture(scope="module")
def streams():
    ev = events_pdf(n=20_000, n_users=50, span_ms=SPAN, seed=96)
    od = orders_stream_pdf(n=10_000, n_users=50, span_ms=SPAN, seed=97)
    return ev, od


@pytest.mark.parametrize("n_windows", [1, 2, 4, 8])
def test_latency_vs_windows(benchmark, streams, n_windows):
    ev, od = streams
    engine = _load_engine(_microbench_script(n_windows=n_windows, n_joins=0, range_ms=10_000), ev, od)
    req = _requests(ev, 1)[0]
    benchmark(lambda: engine.process_request(req))


@pytest.mark.parametrize("rows", [10, 100, 1000])
def test_latency_vs_window_rows(benchmark, streams, rows):
    ev, od = streams
    engine = _load_engine(_microbench_script(n_windows=2, n_joins=0, rows=rows), ev, od)
    req = _requests(ev, 1)[0]
    benchmark(lambda: engine.process_request(req))


@pytest.mark.parametrize("n_joins", [0, 2, 4])
def test_latency_vs_joins(benchmark, streams, n_joins):
    ev, od = streams
    engine = _load_engine(_microbench_script(n_windows=1, n_joins=n_joins, range_ms=10_000), ev, od)
    req = _requests(ev, 1)[0]
    benchmark(lambda: engine.process_request(req))
