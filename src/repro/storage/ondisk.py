"""On-disk persistent store (paper Section 7.3, RocksDB substitution).

Reproduces the structure the paper builds on RocksDB with local Parquet
files: each index is a **column family** with its own sorted-run (SST)
files and its own eviction policy, while all column families share one
in-memory memtable — the refined skiplist — keyed by the composite
``(key, ts)``. Flushing writes a memtable snapshot as one sorted run per
column family; reads merge the memtable with the on-disk runs; eviction
drops whole out-of-date rows by parsing the composite key's timestamp,
exactly the mechanism described in the paper.
"""
from __future__ import annotations

import os
from dataclasses import dataclass

import pandas as pd

from repro.storage.skiplist import TimeSeriesSkipList


@dataclass(frozen=True)
class ColumnFamily:
    """One index: which column provides the key, plus its TTL policy."""

    name: str
    key_col: str
    ttl_ms: int | None = None


class DiskTable:
    """A persistent table with per-index column families.

    ``put`` inserts into the shared memtable (one skiplist per column
    family view, all fed by the same write); ``flush`` persists each
    family's snapshot as a sorted Parquet run; ``scan`` merges memtable
    and runs for a (key, time-range) query; ``evict`` applies each
    family's TTL to both memtable and runs independently.
    """

    def __init__(self, root: str, ts_col: str, families: list[ColumnFamily]) -> None:
        self.root = root
        self.ts_col = ts_col
        self.families = {f.name: f for f in families}
        self._mem: dict[str, TimeSeriesSkipList] = {
            f.name: TimeSeriesSkipList() for f in families
        }
        self._run_counter: dict[str, int] = {f.name: 0 for f in families}
        for f in families:
            os.makedirs(self._cf_dir(f.name), exist_ok=True)

    def _cf_dir(self, cf: str) -> str:
        return os.path.join(self.root, cf)

    def _runs(self, cf: str) -> list[str]:
        d = self._cf_dir(cf)
        return sorted(
            os.path.join(d, f) for f in os.listdir(d) if f.endswith(".parquet")
        )

    # -- writes ---------------------------------------------------------------

    def put(self, row: dict) -> None:
        ts = int(row[self.ts_col])
        for name, fam in self.families.items():
            self._mem[name].put(row[fam.key_col], ts, row)

    def flush(self) -> None:
        """Write each family's memtable as one sorted run, then clear it."""
        for name, fam in self.families.items():
            mem = self._mem[name]
            records = []
            for key, times in mem.items():
                for ts, row in times:
                    records.append({"__key": key, "__ts": ts, **row})
            if records:
                run = pd.DataFrame.from_records(records).sort_values(
                    ["__key", "__ts"], kind="mergesort"
                )
                path = os.path.join(
                    self._cf_dir(name), f"run-{self._run_counter[name]:05d}.parquet"
                )
                run.to_parquet(path)
                self._run_counter[name] += 1
            self._mem[name] = TimeSeriesSkipList()

    # -- reads ----------------------------------------------------------------

    def scan(self, cf: str, key, ts_lo: int, ts_hi: int) -> list[dict]:
        """Rows for ``key`` with ts in (ts_lo, ts_hi], newest first,
        merged across the memtable and all sorted runs."""
        fam = self.families[cf]
        out: list[tuple[int, dict]] = []
        mem = self._mem[cf].get(key)
        if mem is not None:
            out.extend(mem.scan_range(ts_lo, ts_hi))
        for path in self._runs(cf):
            run = pd.read_parquet(path)
            hit = run[(run["__key"] == key) & (run["__ts"] > ts_lo) & (run["__ts"] <= ts_hi)]
            for rec in hit.to_dict("records"):
                rec.pop("__key")
                ts = rec.pop("__ts")
                out.append((ts, rec))
        out.sort(key=lambda t: -t[0])
        return [row for _, row in out]

    def latest_before(self, cf: str, key, ts_hi: int) -> dict | None:
        rows = self.scan(cf, key, -1, ts_hi)
        return rows[0] if rows else None

    # -- eviction -------------------------------------------------------------

    def evict(self, now_ts: int) -> int:
        """Apply each column family's TTL independently; returns rows dropped."""
        dropped = 0
        for name, fam in self.families.items():
            if fam.ttl_ms is None:
                continue
            cutoff = now_ts - fam.ttl_ms
            dropped += self._mem[name].evict_before(cutoff)
            for path in self._runs(name):
                run = pd.read_parquet(path)
                kept = run[run["__ts"] >= cutoff]
                if len(kept) < len(run):
                    dropped += len(run) - len(kept)
                    if kept.empty:
                        os.remove(path)
                    else:
                        kept.to_parquet(path)
        return dropped

    def n_rows(self, cf: str) -> int:
        n = self._mem[cf].n_entries
        for path in self._runs(cf):
            n += len(pd.read_parquet(path))
        return n
