"""Tests for the self-adjusted window union (Section 5.2): identical
results, better balance, asymptotically fewer operations."""
import numpy as np
import pytest

from repro.online.self_adjust import run_self_adjusting, run_static
from repro.synth_data import events_pdf, orders_stream_pdf


def _streams(n=4_000, n_users=8, alpha=1.2, span_ms=400_000):
    ev = events_pdf(n=n, n_users=n_users, span_ms=span_ms, alpha=alpha, seed=3)
    od = orders_stream_pdf(n=n // 2, n_users=n_users, span_ms=span_ms, seed=4)
    return {"events": ev, "orders": od}


ARGS = dict(key_col="userid", ts_col="ts", value_col="price", window_ms=60_000)


class TestCorrectness:
    def test_results_identical_across_strategies(self):
        tables = _streams()
        a = run_static(tables, **ARGS, n_workers=8)
        b = run_self_adjusting(tables, **ARGS, n_workers=8)
        assert a.n_tuples == b.n_tuples
        np.testing.assert_allclose(a.results, b.results, rtol=1e-9)

    def test_results_identical_with_rebalancing_churn(self):
        tables = _streams(n=3_000)
        a = run_static(tables, **ARGS, n_workers=4)
        b = run_self_adjusting(tables, **ARGS, n_workers=4, rebalance_every=200)
        np.testing.assert_allclose(a.results, b.results, rtol=1e-9)

    def test_single_table_degenerate_case(self):
        ev = events_pdf(n=500, n_users=3, span_ms=50_000, seed=1)
        a = run_static({"events": ev}, **ARGS)
        b = run_self_adjusting({"events": ev}, **ARGS)
        np.testing.assert_allclose(a.results, b.results, rtol=1e-9)

    def test_window_sum_matches_brute_force(self):
        ev = events_pdf(n=300, n_users=2, span_ms=30_000, seed=5)
        rep = run_static({"events": ev}, **ARGS)
        ev_sorted = ev.sort_values("ts").reset_index(drop=True)
        for i in [0, 50, 150, 299]:
            row = ev_sorted.iloc[i]
            lo = int(row["ts"]) - ARGS["window_ms"]
            mask = (
                (ev_sorted["userid"] == row["userid"])
                & (ev_sorted["ts"] >= lo)
                & (ev_sorted["ts"] <= int(row["ts"]))
                & (ev_sorted.index <= i)
            )
            assert rep.results[i] == pytest.approx(float(ev_sorted[mask]["price"].sum()))


class TestEfficiency:
    def test_incremental_touches_far_fewer_rows(self):
        tables = _streams(n=6_000)
        a = run_static(tables, **ARGS)
        b = run_self_adjusting(tables, **ARGS)
        # Static recompute is O(window) per tuple; subtract-and-evict is O(1)
        # amortized — the paper's throughput-collapse vs flat claim.
        assert b.total_ops < a.total_ops / 5

    def test_static_cost_grows_with_window_self_adjusting_does_not(self):
        tables = _streams(n=5_000)
        small_s = run_static(tables, **{**ARGS, "window_ms": 10_000})
        big_s = run_static(tables, **{**ARGS, "window_ms": 300_000})
        small_d = run_self_adjusting(tables, **{**ARGS, "window_ms": 10_000})
        big_d = run_self_adjusting(tables, **{**ARGS, "window_ms": 300_000})
        assert big_s.total_ops > 2 * small_s.total_ops
        assert big_d.total_ops < 1.5 * small_d.total_ops

    def test_load_balance_improves_under_skew(self):
        tables = _streams(n=8_000, n_users=6, alpha=1.5)
        a = run_static(tables, **ARGS, n_workers=8)
        b = run_self_adjusting(tables, **ARGS, n_workers=8, rebalance_every=500)
        assert b.imbalance < a.imbalance

    def test_makespan_improves_under_skew(self):
        tables = _streams(n=8_000, n_users=6, alpha=1.5)
        a = run_static(tables, **ARGS, n_workers=8)
        b = run_self_adjusting(tables, **ARGS, n_workers=8, rebalance_every=500)
        assert b.makespan_ops < a.makespan_ops
