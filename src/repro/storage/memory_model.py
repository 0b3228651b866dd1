"""Memory estimation model (paper Section 8.1) and Table 2 dataset models.

Implements the paper's empirical formula

    mem_total = Σ_tables n_replica · [ Σ_indexes n_pk·(|pk| + 156)
                                       + n_index · n_row · C
                                       + K · n_row · |row| ]

with C = 70 for "latest"/"absorlat" tables and C = 74 for
"absolute"/"absandlat" tables, and K ∈ [1, n_index] data copies. The paper's
worked example (1 M rows, |row| = 300, two indexes, two replicas, 16-byte
keys, C = 70, K = 1) evaluates to ≈ 1.568 GB and is pinned by a test.

On top of the formula, :class:`OpenMLDBTableModel` and
:class:`RedisTableModel` give total bytes for the Table 2 experiment
(TalkingData-like tuples indexed by ``ip``), including per-server baseline
RSS so the small-N regime behaves like the paper's measurements.
"""
from __future__ import annotations

from dataclasses import dataclass, field

from repro.storage.encoding import (
    Schema,
    redis_key_overhead,
    redis_row_overhead,
    row_size,
)

#: per-row index-node cost C by table type (bytes).
TABLE_TYPE_C = {"latest": 70, "absorlat": 70, "absolute": 74, "absandlat": 74}

#: per-unique-primary-key skiplist node overhead beyond the key bytes.
PK_NODE_OVERHEAD = 156


@dataclass(frozen=True)
class IndexSpec:
    """One index of a table: unique key count and average key length."""

    n_pk: int
    pk_len: float


@dataclass(frozen=True)
class TableSpec:
    """Inputs of the Section 8.1 formula for a single table."""

    n_rows: int
    row_len: float
    indexes: tuple[IndexSpec, ...]
    n_replicas: int = 1
    table_type: str = "latest"
    k_copies: int = 1

    def __post_init__(self) -> None:
        if self.table_type not in TABLE_TYPE_C:
            raise ValueError(f"unknown table type {self.table_type!r}")
        if not 1 <= self.k_copies <= max(1, len(self.indexes)):
            raise ValueError("K must lie in [1, n_index]")


def estimate_table_bytes(t: TableSpec) -> float:
    """mem for one table (the bracketed term times n_replica)."""
    c = TABLE_TYPE_C[t.table_type]
    pk_term = sum(ix.n_pk * (ix.pk_len + PK_NODE_OVERHEAD) for ix in t.indexes)
    node_term = len(t.indexes) * t.n_rows * c
    data_term = t.k_copies * t.n_rows * t.row_len
    return t.n_replicas * (pk_term + node_term + data_term)


def estimate_total_bytes(tables: list[TableSpec]) -> float:
    """mem_total over all tables (pre-aggregation cost excluded, as in the paper)."""
    return sum(estimate_table_bytes(t) for t in tables)


def recommend_storage(t: TableSpec, *, available_bytes: float, latency_budget_ms: float) -> str:
    """Table-placement advisor from Section 8.1's guidance.

    In-memory when the estimate fits and ~10 ms latency is demanded;
    disk-based when memory is short and 20–30 ms is acceptable.
    """
    est = estimate_table_bytes(t)
    if est <= available_bytes and latency_budget_ms <= 15:
        return "memory"
    if est > available_bytes:
        return "disk"
    return "memory" if latency_budget_ms <= 15 else "disk"


# --- Table 2 dataset-level models --------------------------------------------

#: TalkingData-like schema used by the Table 2 experiment.
TALKINGDATA_SCHEMA = Schema(
    fields=(
        ("ip", "int"),
        ("app", "int"),
        ("device", "int"),
        ("os", "int"),
        ("channel", "int"),
        ("click_time", "timestamp"),
        ("is_attributed", "int"),
    )
)


@dataclass(frozen=True)
class OpenMLDBTableModel:
    """Total OpenMLDB bytes for N tuples indexed by ``ip``.

    Row payload comes from the real codec (:func:`row_size` over a
    representative tuple — the schema is all fixed-width so every row is the
    same size), index nodes and key nodes from the Section 8.1 formula, plus
    a small per-server process baseline (empty tablet RSS).
    """

    schema: Schema = TALKINGDATA_SCHEMA
    table_type: str = "latest"
    pk_len: float = 8.0
    n_servers: int = 3
    server_baseline: int = 440_000  # empty tablet RSS, bytes

    def row_bytes(self) -> int:
        sample = [1, 1, 1, 1, 1, 1_704_067_200_000, 0]
        return row_size(self.schema, sample)

    def total_bytes(self, n_tuples: int, n_keys: int) -> int:
        spec = TableSpec(
            n_rows=n_tuples,
            row_len=self.row_bytes(),
            indexes=(IndexSpec(n_pk=n_keys, pk_len=self.pk_len),),
            table_type=self.table_type,
        )
        return int(estimate_table_bytes(spec)) + self.n_servers * self.server_baseline


@dataclass(frozen=True)
class RedisTableModel:
    """Total Redis bytes for the same N tuples (Table 2 baseline).

    One Redis hash per distinct ``ip``; per tuple a hashtable field keyed by
    the 13-char timestamp whose value is the JSON-serialized row
    (~``json_len`` chars); per distinct key the main-dict/robj/dict-header
    cost; per server the empty ``redis-server`` RSS (~3 MB). The paper's
    Trino+Redis deployment spans three data servers, hence ``n_servers=3``.
    """

    json_len: int = 85
    n_servers: int = 3
    server_baseline: int = 3_000_000  # empty redis-server RSS, bytes

    def total_bytes(self, n_tuples: int, n_keys: int) -> int:
        per_tuple = redis_row_overhead(self.json_len)
        per_key = redis_key_overhead()
        # Main dict bucket array: power-of-two slots, 8 bytes each.
        slots = 1
        while slots < n_keys:
            slots *= 2
        return (
            n_tuples * per_tuple
            + n_keys * per_key
            + slots * 8
            + self.n_servers * self.server_baseline
        )
