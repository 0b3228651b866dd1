"""Benchmark: Figure 8 — offline MicroBench (single-window / multi-window
/ skewed) on Spark. One measured round per config: these are batch jobs.
"""
import pytest

from repro.bench.offline_experiments import _base, _windows
from repro.core.spec import AggSpec, WindowSpec
from repro.offline.multi_window import kernel_parallel, spark_serial_native
from repro.offline.skew import skew_resolved_window
from repro.offline.windows import compute_window_features

N = 40_000


@pytest.fixture(scope="module")
def uniform_base(spark):
    df = _base(spark, n=N, n_users=64)
    yield df
    df.unpersist()


@pytest.fixture(scope="module")
def skewed_base(spark):
    df = _base(spark, n=N, n_users=32, alpha=1.4, seed=102)
    yield df
    df.unpersist()


@pytest.mark.parametrize("n_windows", [1, 4])
def test_spark_native(benchmark, uniform_base, n_windows):
    w, g = _windows(n_windows, 30_000)
    benchmark.pedantic(
        lambda: spark_serial_native(uniform_base, w, g).count(), rounds=2, iterations=1
    )


@pytest.mark.parametrize("n_windows", [1, 4])
def test_openmldb_plan(benchmark, uniform_base, n_windows):
    w, g = _windows(n_windows, 30_000)
    benchmark.pedantic(
        lambda: kernel_parallel(uniform_base, {}, w, g).count(), rounds=2, iterations=1
    )


_SKEW_W = WindowSpec(name="w", partition_by="userid", order_by="ts", range_ms=60_000)
# drawdown keeps the skew rows on the per-row kernel path.
_SKEW_AGGS = [
    AggSpec("sum", "price", "w", "s"),
    AggSpec("avg", "price", "w", "a"),
    AggSpec("drawdown", "price", "w", "d"),
]


def test_skewed_no_opt(benchmark, skewed_base):
    benchmark.pedantic(
        lambda: compute_window_features(skewed_base, {}, _SKEW_W, _SKEW_AGGS).count(),
        rounds=2, iterations=1,
    )


def test_skewed_with_opt(benchmark, skewed_base):
    benchmark.pedantic(
        lambda: skew_resolved_window(skewed_base, {}, _SKEW_W, _SKEW_AGGS, n_quantiles=8).count(),
        rounds=2, iterations=1,
    )
