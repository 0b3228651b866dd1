"""Compact in-memory row encoding (paper Section 7.1) and byte models.

Implements the OpenMLDB row layout:

* **Header (6 bytes)** — field version (1 B), schema version (1 B), total
  row size (4 B, little-endian ``uint32``).
* **Null bitmap** — ``ceil(n_cols / 8)`` bytes; bit *i* set marks column
  *i* NULL.
* **Fixed-size fields** — stored contiguously in schema order at their
  natural width (``int`` 4 B, ``double``/``timestamp`` 8 B, ...); a NULL
  fixed field still occupies its slot (the bitmap disambiguates).
* **Var-length fields** — an offset array (one entry per var column,
  width adaptively 1/2/4 bytes depending on total row size) holding the
  *end* offset of each value inside the var-data section, followed by the
  raw bytes. Lengths are offset differences, so no per-string 32-bit
  length field is stored — exactly the paper's optimization.

Alongside the real codec, two *byte models* reproduce the comparisons the
paper reports: :func:`spark_unsaferow_size` (the worked example of
Section 7.1: 556 vs 255 bytes) and the Redis model used for Table 2
(:func:`redis_row_overhead` / :class:`RedisTableModel` in
``repro.storage.memory_model``).
"""
from __future__ import annotations

import struct
from dataclasses import dataclass

#: bytes occupied by each fixed-width type (paper's memory-saving example
#: counts int and float at 4 bytes, timestamp at 8).
FIXED_WIDTH = {
    "bool": 1,
    "smallint": 2,
    "int": 4,
    "bigint": 8,
    "float": 4,
    "double": 8,
    "timestamp": 8,
}
VAR_TYPES = {"string"}
HEADER_SIZE = 6

_PACK = {
    "bool": "<b",
    "smallint": "<h",
    "int": "<i",
    "bigint": "<q",
    "float": "<f",
    "double": "<d",
    "timestamp": "<q",
}


@dataclass(frozen=True)
class Schema:
    """An ordered column schema: ``fields`` is a tuple of (name, type)."""

    fields: tuple[tuple[str, str], ...]

    def __post_init__(self) -> None:
        for name, typ in self.fields:
            if typ not in FIXED_WIDTH and typ not in VAR_TYPES:
                raise ValueError(f"unknown type {typ!r} for column {name!r}")

    @property
    def names(self) -> list[str]:
        return [n for n, _ in self.fields]

    @property
    def n_cols(self) -> int:
        return len(self.fields)

    @property
    def bitmap_size(self) -> int:
        return (self.n_cols + 7) // 8

    @property
    def fixed_size(self) -> int:
        return sum(FIXED_WIDTH[t] for _, t in self.fields if t in FIXED_WIDTH)

    @property
    def var_cols(self) -> list[int]:
        return [i for i, (_, t) in enumerate(self.fields) if t in VAR_TYPES]


def _offset_width(total_size: int) -> int:
    """Adaptive offset width: 1 byte while the row fits in 255 bytes, etc."""
    if total_size <= 0xFF:
        return 1
    if total_size <= 0xFFFF:
        return 2
    return 4


def row_size(schema: Schema, values: list) -> int:
    """Exact encoded size of ``values`` under ``schema`` (== len(encode_row))."""
    var_bytes = 0
    for i in schema.var_cols:
        v = values[i]
        var_bytes += len(v.encode("utf-8")) if v is not None else 0
    n_var = len(schema.var_cols)
    base = HEADER_SIZE + schema.bitmap_size + schema.fixed_size + var_bytes
    # Offset width depends on the total, which depends on the width: fixpoint
    # over the three candidate widths (monotone, so first consistent wins).
    for w in (1, 2, 4):
        total = base + n_var * w
        if _offset_width(total) <= w:
            return total
    raise AssertionError("unreachable")


def encode_row(schema: Schema, values: list, *, field_version: int = 1, schema_version: int = 1) -> bytes:
    """Encode one row to the compact byte layout described in Section 7.1."""
    if len(values) != schema.n_cols:
        raise ValueError(f"expected {schema.n_cols} values, got {len(values)}")
    total = row_size(schema, values)
    out = bytearray()
    out += struct.pack("<BBI", field_version, schema_version, total)
    bitmap = bytearray(schema.bitmap_size)
    for i, v in enumerate(values):
        if v is None:
            bitmap[i // 8] |= 1 << (i % 8)
    out += bitmap
    for i, (_, typ) in enumerate(schema.fields):
        if typ in FIXED_WIDTH:
            v = values[i]
            out += struct.pack(_PACK[typ], 0 if v is None else v)
    ow = _offset_width(total)
    var_data = bytearray()
    offsets = []
    for i in schema.var_cols:
        v = values[i]
        if v is not None:
            var_data += v.encode("utf-8")
        offsets.append(len(var_data))
    fmt = {1: "<B", 2: "<H", 4: "<I"}[ow]
    for off in offsets:
        out += struct.pack(fmt, off)
    out += var_data
    assert len(out) == total, (len(out), total)
    return bytes(out)


def decode_row(schema: Schema, buf: bytes) -> list:
    """Decode :func:`encode_row` output back to a value list (NULLs → None)."""
    field_ver, schema_ver, total = struct.unpack_from("<BBI", buf, 0)
    if total != len(buf):
        raise ValueError(f"row size mismatch: header says {total}, buffer is {len(buf)}")
    pos = HEADER_SIZE
    bitmap = buf[pos : pos + schema.bitmap_size]
    pos += schema.bitmap_size
    values: list = [None] * schema.n_cols
    for i, (_, typ) in enumerate(schema.fields):
        if typ in FIXED_WIDTH:
            (v,) = struct.unpack_from(_PACK[typ], buf, pos)
            pos += FIXED_WIDTH[typ]
            if not (bitmap[i // 8] >> (i % 8)) & 1:
                values[i] = bool(v) if typ == "bool" else v
    ow = _offset_width(total)
    fmt = {1: "<B", 2: "<H", 4: "<I"}[ow]
    n_var = len(schema.var_cols)
    ends = [struct.unpack_from(fmt, buf, pos + j * ow)[0] for j in range(n_var)]
    var_base = pos + n_var * ow
    prev = 0
    for j, i in enumerate(schema.var_cols):
        if not (bitmap[i // 8] >> (i % 8)) & 1:
            values[i] = buf[var_base + prev : var_base + ends[j]].decode("utf-8")
        prev = ends[j]
    return values


def spark_unsaferow_size(schema: Schema, values: list) -> int:
    """Spark UnsafeRow size under the paper's simplified accounting.

    Null bit set of ``ceil(n_cols/64)`` 8-byte words, 8 bytes per fixed
    field, and ``8 + len`` bytes per string (8-byte fixed slot plus the
    data). Reproduces the worked example: the 65-column row is 556 bytes
    here vs 255 under :func:`row_size`.
    """
    null_words = (schema.n_cols + 63) // 64
    size = null_words * 8
    for i, (_, typ) in enumerate(schema.fields):
        if typ in VAR_TYPES:
            v = values[i]
            size += 8 + (len(v.encode("utf-8")) if v is not None else 0)
        else:
            size += 8
    return size


# --- Redis byte model (Table 2 baseline) ------------------------------------

#: jemalloc small/large size-class boundaries (bytes); allocations round up.
_JEMALLOC_CLASSES = [
    8, 16, 32, 48, 64, 80, 96, 112, 128, 160, 192, 224, 256, 320, 384, 448,
    512, 640, 768, 896, 1024, 1280, 1536, 1792, 2048, 2560, 3072, 3584, 4096,
]


def jemalloc_bin(n: int) -> int:
    """Bytes actually allocated by jemalloc for an ``n``-byte request."""
    for c in _JEMALLOC_CLASSES:
        if n <= c:
            return c
    # Beyond the small classes: round up to the next 4 KiB page.
    return ((n + 4095) // 4096) * 4096


def sds_bytes(n_chars: int) -> int:
    """Allocated size of a Redis sds string: 4-byte sds8 header + data + NUL."""
    return jemalloc_bin(n_chars + 4 + 1)


def redis_row_overhead(serialized_len: int, *, field_len: int = 13) -> int:
    """Bytes one tuple costs inside a Redis hash keyed by ``ip``.

    Model (documented substitution for the paper's Jedis measurement): each
    table key ``ip`` maps to a Redis hash whose fields are the 13-char
    epoch-millis timestamp and whose values are the JSON-serialized row.
    A hashtable-encoded hash charges per field: a ``dictEntry`` (3 pointers,
    24 B) + its bucket slot (8 B) + the field sds + a ``robj`` wrapper
    (16 B) + the value sds.
    """
    return (
        jemalloc_bin(24)  # dictEntry
        + 8  # hashtable bucket slot
        + sds_bytes(field_len)  # field: "1704067200000"
        + 16  # robj for the value
        + sds_bytes(serialized_len)
    )


def redis_key_overhead(key_len: int = 9) -> int:
    """Per-distinct-key cost: main-dict entry + key sds + robj + dict header.

    ``dict`` struct ≈ 96 B; initial 4-slot bucket array ≈ 32 B.
    """
    return jemalloc_bin(24) + 8 + sds_bytes(key_len) + 16 + 96 + 32
