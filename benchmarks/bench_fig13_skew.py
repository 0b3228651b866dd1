"""Benchmark: Figure 13 — skewed window job, baseline vs skew-2/4/8."""
import pytest

from repro.bench.offline_experiments import _base
from repro.core.spec import AggSpec, WindowSpec
from repro.offline.skew import skew_resolved_window
from repro.offline.windows import compute_window_features

W = WindowSpec(name="w", partition_by="userid", order_by="ts", range_ms=60_000)
# drawdown keeps the work on the per-row kernel path (see offline_experiments).
AGGS = [
    AggSpec("sum", "price", "w", "s"),
    AggSpec("avg", "price", "w", "a"),
    AggSpec("drawdown", "price", "w", "d"),
]


@pytest.fixture(scope="module")
def skewed(spark):
    df = _base(spark, n=40_000, n_users=24, alpha=1.5, seed=104)
    yield df
    df.unpersist()


def test_no_skew_opt(benchmark, skewed):
    benchmark.pedantic(
        lambda: compute_window_features(skewed, {}, W, AGGS).count(), rounds=2, iterations=1
    )


@pytest.mark.parametrize("q", [2, 4, 8])
def test_skew_opt(benchmark, skewed, q):
    benchmark.pedantic(
        lambda: skew_resolved_window(skewed, {}, W, AGGS, n_quantiles=q).count(),
        rounds=2, iterations=1,
    )
