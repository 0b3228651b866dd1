"""Measurement harness shared by jobs/ and benchmarks/.

Latency percentiles follow the paper's reporting convention (TP50 / TP90
/ TP95 / TP99 / TP999, milliseconds). ``print_table`` renders paper-style
rows so ``jobs/*.py`` output can be diffed against EXPERIMENTS.md.
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Callable, Iterable

import numpy as np

PERCENTILES = (50, 90, 95, 99, 99.9)


@dataclass(frozen=True)
class LatencyReport:
    """Latency distribution (ms) and throughput of a request loop."""

    latencies_ms: tuple[float, ...]
    wall_s: float

    @property
    def n(self) -> int:
        return len(self.latencies_ms)

    def tp(self, p: float) -> float:
        return float(np.percentile(np.asarray(self.latencies_ms), p))

    @property
    def qps(self) -> float:
        return self.n / self.wall_s if self.wall_s > 0 else float("inf")

    def row(self) -> dict:
        out = {f"TP{str(p).replace('.', '')}": round(self.tp(p), 3) for p in PERCENTILES}
        out["QPS"] = round(self.qps, 1)
        return out


def measure_requests(fn: Callable[[object], object], requests: Iterable) -> LatencyReport:
    """Time ``fn`` per request; returns the latency distribution."""
    lats = []
    t0 = time.perf_counter()
    for r in requests:
        s = time.perf_counter()
        fn(r)
        lats.append((time.perf_counter() - s) * 1_000.0)
    wall = time.perf_counter() - t0
    return LatencyReport(latencies_ms=tuple(lats), wall_s=wall)


def time_call(fn: Callable[[], object], *, repeat: int = 1) -> float:
    """Best-of-``repeat`` wall seconds for a batch job."""
    best = float("inf")
    for _ in range(repeat):
        t0 = time.perf_counter()
        fn()
        best = min(best, time.perf_counter() - t0)
    return best


def print_table(title: str, rows: list[dict], *, file=None) -> None:
    """Render rows as an aligned text table (one per paper table/figure)."""
    if not rows:
        print(f"== {title} == (no rows)", file=file)
        return
    cols = list(rows[0].keys())
    widths = {c: max(len(str(c)), *(len(str(r.get(c, ""))) for r in rows)) for c in cols}
    print(f"== {title} ==", file=file)
    print("  ".join(str(c).ljust(widths[c]) for c in cols), file=file)
    for r in rows:
        print("  ".join(str(r.get(c, "")).ljust(widths[c]) for c in cols), file=file)
    print("", file=file)
