"""OpenMLDB SQL surface functions (paper Table 1).

Row-level functions (string parsing, labels, feature signatures) live
here; window aggregates (``topn_frequency``, ``avg_cate_where``,
``drawdown``, ``ew_avg``, ...) are kernels in ``repro.core.kernels`` and
are exposed through :class:`~repro.core.spec.AggSpec`. Spark UDF wrappers
are provided for use inside DataFrame expressions.

Feature signatures implement Section 4.1(5): *label* columns pass
through, *discrete* columns hash into a high-dimensional space
(feature-hashing [Weinberger et al.]), *continuous* columns keep their
value at a dedicated dimension — emitted directly as LibSVM lines so raw
ultra-high-dimension tables never need exporting.
"""
from __future__ import annotations

import zlib
from dataclasses import dataclass

from pyspark.sql import functions as F
from pyspark.sql.types import ArrayType, IntegerType, StringType


def split_by_key(input_string: str | None, delimiter: str, kv_delimiter: str) -> list[str]:
    """Split ``input_string`` by ``delimiter``, treat each segment as a
    key/value pair, and return the list of keys (Table 1's ``split_by_key``).

    Segments without ``kv_delimiter`` are skipped; empty input yields [].
    """
    if not input_string:
        return []
    keys = []
    for seg in input_string.split(delimiter):
        if kv_delimiter in seg:
            keys.append(seg.split(kv_delimiter, 1)[0])
    return keys


def split_by_value(input_string: str | None, delimiter: str, kv_delimiter: str) -> list[str]:
    """Companion of :func:`split_by_key` returning the values."""
    if not input_string:
        return []
    return [
        seg.split(kv_delimiter, 1)[1]
        for seg in input_string.split(delimiter)
        if kv_delimiter in seg
    ]


class MulticlassLabeler:
    """``multiclass_label``: map distinct column values to dense int labels.

    Deterministic: labels are assigned by first appearance during
    :meth:`fit` (or lazily on transform), so offline and online runs that
    share a fitted labeler agree.
    """

    def __init__(self) -> None:
        self._labels: dict[str, int] = {}

    def fit(self, values) -> "MulticlassLabeler":
        for v in values:
            self._labels.setdefault(str(v), len(self._labels))
        return self

    def transform(self, value) -> int:
        key = str(value)
        if key not in self._labels:
            self._labels[key] = len(self._labels)
        return self._labels[key]

    @property
    def n_classes(self) -> int:
        return len(self._labels)


def hash_discrete(column: str, value, dim: int = 1 << 20) -> int:
    """Feature-hash a discrete value into ``[0, dim)`` — stable across runs
    (crc32, not Python's randomized ``hash``)."""
    return zlib.crc32(f"{column}={value}".encode("utf-8")) % dim


@dataclass(frozen=True)
class SignatureSpec:
    """Column usage marking for signature export.

    ``label`` names the label column; ``discrete`` columns are hashed into
    ``dim`` dimensions; ``continuous`` columns occupy one dense dimension
    each, placed after the hash space.
    """

    label: str
    discrete: tuple[str, ...] = ()
    continuous: tuple[str, ...] = ()
    dim: int = 1 << 20

    def continuous_index(self, col: str) -> int:
        return self.dim + self.continuous.index(col)


def to_libsvm(row: dict, spec: SignatureSpec) -> str:
    """Export one feature row as a LibSVM line ``label idx:val ...``.

    Indices are emitted sorted ascending as LibSVM requires; discrete
    hash collisions within a row keep the last value (rare at 2^20 dims).
    """
    feats: dict[int, float] = {}
    for c in spec.discrete:
        if row.get(c) is not None:
            feats[hash_discrete(c, row[c], spec.dim)] = 1.0
    for c in spec.continuous:
        if row.get(c) is not None:
            feats[spec.continuous_index(c)] = float(row[c])
    body = " ".join(f"{i}:{feats[i]:g}" for i in sorted(feats))
    return f"{row[spec.label]} {body}".rstrip()


# --- Spark UDF wrappers ------------------------------------------------------

# Lambdas avoid pyspark's eval-type inference warning on annotated funcs.
split_by_key_udf = F.udf(lambda s, d, kd: split_by_key(s, d, kd), ArrayType(StringType()))
split_by_value_udf = F.udf(lambda s, d, kd: split_by_value(s, d, kd), ArrayType(StringType()))


def hash_discrete_udf(dim: int = 1 << 20):
    """Spark UDF factory for :func:`hash_discrete` at a fixed ``dim``."""
    return F.udf(lambda col, val: hash_discrete(col, val, dim), IntegerType())
