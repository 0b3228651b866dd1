"""Tests for the measurement harness (repro.bench.harness)."""
import io
import time

from repro.bench.harness import LatencyReport, measure_requests, print_table, time_call


class TestLatencyReport:
    def _report(self):
        return LatencyReport(latencies_ms=tuple(float(i) for i in range(1, 101)), wall_s=1.0)

    def test_percentiles(self):
        r = self._report()
        assert r.tp(50) == 50.5
        assert r.tp(99) < r.tp(99.9) <= 100.0

    def test_qps(self):
        assert self._report().qps == 100.0

    def test_row_keys(self):
        row = self._report().row()
        assert set(row) == {"TP50", "TP90", "TP95", "TP99", "TP999", "QPS"}


class TestMeasurement:
    def test_measure_requests_counts_and_times(self):
        rep = measure_requests(lambda r: time.sleep(0.001), range(5))
        assert rep.n == 5
        assert all(l >= 1.0 for l in rep.latencies_ms)

    def test_time_call_best_of(self):
        t = time_call(lambda: time.sleep(0.005), repeat=2)
        assert 0.004 < t < 0.1


class TestPrintTable:
    def test_renders_aligned_rows(self):
        buf = io.StringIO()
        print_table("T", [{"a": 1, "bb": "x"}, {"a": 22, "bb": "yyy"}], file=buf)
        out = buf.getvalue()
        assert "== T ==" in out and "22" in out and "yyy" in out

    def test_empty_rows(self):
        buf = io.StringIO()
        print_table("T", [], file=buf)
        assert "(no rows)" in buf.getvalue()
