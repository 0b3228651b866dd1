"""Self-adjusted window union (paper Section 5.2).

Simulates the online engine's multi-worker processing of a multi-table
tuple stream under two strategies:

* **Static** (the Flink-style baseline): tuples route to workers by
  ``hash(key) % n_workers`` forever, and every tuple's window aggregate
  is recomputed from scratch over the worker's retained buffer (the
  paper's observation that without a state-retention mechanism the
  engine re-scans/re-sorts to evict the oldest rows).
* **Self-adjusting** (OpenMLDB): a dynamic scheduler periodically
  re-maps keys to workers from measured per-worker load — hot keys can
  be *shared* by several collaborating workers whose partial states merge
  on read — and sliding aggregates update incrementally with
  Subtract-and-Evict: O(1) per tuple for invertible aggregates.

Workers are simulated deterministically: each strategy reports per-worker
*operation counts* (rows touched — the load balancing signal and the
machine-independent cost) and the run's wall time. Both strategies emit
identical per-tuple aggregate results (asserted by tests); only the cost
differs, which is exactly the paper's Figure "window union optimization"
claim (static throughput collapses with window size, self-adjusting stays
flat).
"""
from __future__ import annotations

from collections import deque
from dataclasses import dataclass, field

import numpy as np
import pandas as pd


@dataclass
class UnionRunReport:
    """Outcome of one strategy over one stream."""

    results: list[float]  # per-tuple window sum, stream order
    worker_ops: list[int]  # rows touched per worker
    n_tuples: int

    @property
    def makespan_ops(self) -> int:
        """Parallel cost: the busiest worker's operation count."""
        return max(self.worker_ops) if self.worker_ops else 0

    @property
    def total_ops(self) -> int:
        return sum(self.worker_ops)

    @property
    def imbalance(self) -> float:
        """max/mean load ratio — 1.0 is perfectly balanced."""
        ops = [o for o in self.worker_ops]
        mean = sum(ops) / len(ops) if ops else 1
        return (max(ops) / mean) if mean else 1.0


def _merged_stream(tables: dict[str, pd.DataFrame], key_col: str, ts_col: str, value_col: str):
    """Arrival-ordered (ts, table-ordinal) union of the input streams."""
    parts = []
    for ordinal, (name, pdf) in enumerate(tables.items()):
        parts.append(
            pd.DataFrame(
                {
                    "key": pdf[key_col].to_numpy(),
                    "ts": pdf[ts_col].to_numpy(),
                    "val": pdf[value_col].to_numpy(dtype="float64"),
                    "ord": ordinal,
                }
            )
        )
    stream = pd.concat(parts, ignore_index=True)
    return stream.sort_values(["ts", "ord"], kind="mergesort").reset_index(drop=True)


def run_static(
    tables: dict[str, pd.DataFrame],
    *,
    key_col: str,
    ts_col: str,
    value_col: str,
    window_ms: int,
    n_workers: int = 8,
) -> UnionRunReport:
    """Flink-style static hashing + full recompute per tuple."""
    stream = _merged_stream(tables, key_col, ts_col, value_col)
    buffers: dict = {}
    ops = [0] * n_workers
    results: list[float] = []
    keys = stream["key"].to_numpy()
    tss = stream["ts"].to_numpy()
    vals = stream["val"].to_numpy()
    for k, ts, v in zip(keys, tss, vals):
        worker = hash(int(k)) % n_workers
        buf = buffers.setdefault(int(k), [])
        buf.append((int(ts), float(v)))
        # No state retention: rescan the whole buffer to find and drop the
        # expired prefix, then re-aggregate the survivors.
        lo = int(ts) - window_ms
        survivors = [(t, x) for t, x in buf if t >= lo]
        buffers[int(k)] = survivors
        results.append(float(sum(x for _, x in survivors)))
        ops[worker] += len(buf)
    return UnionRunReport(results=results, worker_ops=ops, n_tuples=len(stream))


def run_self_adjusting(
    tables: dict[str, pd.DataFrame],
    *,
    key_col: str,
    ts_col: str,
    value_col: str,
    window_ms: int,
    n_workers: int = 8,
    rebalance_every: int = 1_000,
) -> UnionRunReport:
    """Dynamic key→worker mapping + Subtract-and-Evict incremental sums.

    Every ``rebalance_every`` tuples the scheduler re-assigns keys: each
    key's recent load moves to the currently least-loaded worker (greedy
    longest-processing-time placement), and keys hotter than a fair share
    are split across two collaborating workers (their per-shard partial
    sums merge on read, keeping results exact).
    """
    stream = _merged_stream(tables, key_col, ts_col, value_col)
    ops = [0] * n_workers
    assignment: dict[int, list[int]] = {}  # key -> collaborating workers
    recent_load: dict[int, int] = {}
    rr: dict[int, int] = {}  # round-robin cursor per shared key

    # Per-key incremental state: deque of (ts, val) + running sum per shard.
    shards: dict[tuple[int, int], deque] = {}
    shard_sums: dict[tuple[int, int], float] = {}

    def workers_for(k: int) -> list[int]:
        got = assignment.get(k)
        if got is None:
            got = [hash(k) % n_workers]
            assignment[k] = got
        return got

    def rebalance() -> None:
        loads = sorted(recent_load.items(), key=lambda kv: -kv[1])
        worker_load = [0] * n_workers
        fair = (sum(recent_load.values()) / n_workers) if recent_load else 0
        new_assignment: dict[int, list[int]] = {}
        for k, load in loads:
            order = np.argsort(worker_load)
            if load > fair and n_workers >= 2:
                chosen = [int(order[0]), int(order[1])]
                for w in chosen:
                    worker_load[w] += load / 2
            else:
                chosen = [int(order[0])]
                worker_load[chosen[0]] += load
            new_assignment[k] = chosen
        assignment.clear()
        assignment.update(new_assignment)
        recent_load.clear()

    results: list[float] = []
    keys = stream["key"].to_numpy()
    tss = stream["ts"].to_numpy()
    vals = stream["val"].to_numpy()
    for i, (k, ts, v) in enumerate(zip(keys, tss, vals)):
        k, ts, v = int(k), int(ts), float(v)
        ws = workers_for(k)
        w = ws[rr.get(k, 0) % len(ws)]
        rr[k] = rr.get(k, 0) + 1
        shard = (k, w)
        dq = shards.setdefault(shard, deque())
        dq.append((ts, v))
        shard_sums[shard] = shard_sums.get(shard, 0.0) + v
        touched = 1
        lo = ts - window_ms
        # Subtract-and-Evict across this key's shards: evicted tuples are
        # subtracted from the running sum — no rescan of survivors.
        total = 0.0
        for wk in ws:
            sh = (k, wk)
            d = shards.get(sh)
            if d is None:
                continue
            while d and d[0][0] < lo:
                old_ts, old_v = d.popleft()
                shard_sums[sh] -= old_v
                touched += 1
            total += shard_sums.get(sh, 0.0)
        results.append(total)
        ops[w] += touched
        recent_load[k] = recent_load.get(k, 0) + touched
        if (i + 1) % rebalance_every == 0:
            # Migrating a key's shards to its new workers is a bounded
            # one-off cost; fold the shard rows into the new first worker.
            old_assign = dict(assignment)
            rebalance()
            for kk, new_ws in assignment.items():
                old_ws = old_assign.get(kk, new_ws)
                for ow in old_ws:
                    if ow not in new_ws and (kk, ow) in shards:
                        tgt = (kk, new_ws[0])
                        moved = shards.pop((kk, ow))
                        moved_sum = shard_sums.pop((kk, ow))
                        tdq = shards.setdefault(tgt, deque())
                        merged = sorted(list(tdq) + list(moved))
                        shards[tgt] = deque(merged)
                        shard_sums[tgt] = shard_sums.get(tgt, 0.0) + moved_sum
    return UnionRunReport(results=results, worker_ops=ops, n_tuples=len(stream))
