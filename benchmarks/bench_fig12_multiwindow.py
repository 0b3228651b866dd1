"""Benchmark: Figure 12 — multi-window execution, serial vs parallel
branches vs Spark-native chained windows (4 windows, medium frames)."""
import pytest

from repro.bench.offline_experiments import _base, _windows
from repro.offline.multi_window import (
    kernel_parallel,
    kernel_serial,
    spark_serial_native,
)

N = 30_000
RANGE_MS = 30_000
N_WINDOWS = 4


@pytest.fixture(scope="module")
def base(spark):
    df = _base(spark, n=N, n_users=48, seed=103)
    yield df
    df.unpersist()


@pytest.fixture(scope="module")
def plan():
    return _windows(N_WINDOWS, RANGE_MS)


def test_serial_branches(benchmark, base, plan):
    w, g = plan
    benchmark.pedantic(lambda: kernel_serial(base, {}, w, g).count(), rounds=2, iterations=1)


def test_parallel_branches(benchmark, base, plan):
    w, g = plan
    benchmark.pedantic(lambda: kernel_parallel(base, {}, w, g).count(), rounds=2, iterations=1)


def test_spark_native_chain(benchmark, base, plan):
    w, g = plan
    benchmark.pedantic(
        lambda: spark_serial_native(base, w, g).count(), rounds=2, iterations=1
    )
