"""Unit tests for the compact row codec (paper Section 7.1)."""
import struct

import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.storage.encoding import (
    FIXED_WIDTH,
    HEADER_SIZE,
    Schema,
    decode_row,
    encode_row,
    jemalloc_bin,
    redis_key_overhead,
    redis_row_overhead,
    row_size,
    sds_bytes,
    spark_unsaferow_size,
)

SIMPLE = Schema((("a", "int"), ("b", "double"), ("c", "string"), ("d", "timestamp")))


class TestSchema:
    def test_unknown_type_rejected(self):
        with pytest.raises(ValueError):
            Schema((("x", "varchar"),))

    def test_names(self):
        assert SIMPLE.names == ["a", "b", "c", "d"]

    def test_bitmap_size_rounds_up(self):
        assert Schema(tuple((f"c{i}", "int") for i in range(8))).bitmap_size == 1
        assert Schema(tuple((f"c{i}", "int") for i in range(9))).bitmap_size == 2
        assert Schema(tuple((f"c{i}", "int") for i in range(65))).bitmap_size == 9

    def test_fixed_size(self):
        assert SIMPLE.fixed_size == 4 + 8 + 8

    def test_var_cols(self):
        assert SIMPLE.var_cols == [2]


class TestRoundTrip:
    @pytest.mark.parametrize(
        "values",
        [
            [1, 2.5, "hello", 1_704_067_200_000],
            [-7, -0.125, "", 0],
            [2**31 - 1, 1e300, "héllo wörld", 2**40],
            [None, 2.5, "x", 5],
            [1, None, None, None],
            [None, None, None, None],
        ],
    )
    def test_roundtrip(self, values):
        assert decode_row(SIMPLE, encode_row(SIMPLE, values)) == values

    def test_size_matches_encoding(self):
        vals = [1, 2.0, "abc", 3]
        assert len(encode_row(SIMPLE, vals)) == row_size(SIMPLE, vals)

    def test_header_contains_total_size(self):
        vals = [1, 2.0, "abc", 3]
        buf = encode_row(SIMPLE, vals)
        _, _, total = struct.unpack_from("<BBI", buf, 0)
        assert total == len(buf)

    def test_wrong_value_count_rejected(self):
        with pytest.raises(ValueError):
            encode_row(SIMPLE, [1, 2.0, "x"])

    def test_truncated_buffer_rejected(self):
        buf = encode_row(SIMPLE, [1, 2.0, "abc", 3])
        with pytest.raises(ValueError):
            decode_row(SIMPLE, buf[:-1])

    def test_null_string_vs_empty_string_distinct(self):
        a = decode_row(SIMPLE, encode_row(SIMPLE, [1, 2.0, None, 3]))
        b = decode_row(SIMPLE, encode_row(SIMPLE, [1, 2.0, "", 3]))
        assert a[2] is None and b[2] == ""

    def test_offset_width_escalates_for_big_rows(self):
        big = "x" * 300  # forces 2-byte offsets
        vals = [1, 2.0, big, 3]
        assert decode_row(SIMPLE, encode_row(SIMPLE, vals)) == vals
        huge = "y" * 70_000  # forces 4-byte offsets
        vals = [1, 2.0, huge, 3]
        assert decode_row(SIMPLE, encode_row(SIMPLE, vals)) == vals

    def test_all_fixed_types_roundtrip(self):
        sch = Schema(tuple((t, t) for t in FIXED_WIDTH))
        vals = [True, -5, 123, 2**40, 0.5, -2.25, 1_704_067_200_000]
        assert decode_row(sch, encode_row(sch, vals)) == vals


@settings(max_examples=200, deadline=None)
@given(
    ints=st.lists(st.one_of(st.integers(-(2**31), 2**31 - 1), st.none()), min_size=1, max_size=6),
    strs=st.lists(st.one_of(st.text(max_size=40), st.none()), min_size=0, max_size=6),
)
def test_roundtrip_property(ints, strs):
    fields = tuple([(f"i{k}", "int") for k in range(len(ints))] + [(f"s{k}", "string") for k in range(len(strs))])
    sch = Schema(fields)
    vals = list(ints) + list(strs)
    assert decode_row(sch, encode_row(sch, vals)) == vals


class TestWorkedExample:
    """The paper's memory-saving example: 20 int + 20 float + 20 1-byte
    strings + 5 timestamps → Spark 556 bytes, OpenMLDB 255 bytes (>54%)."""

    def _schema_vals(self):
        fields = tuple(
            [(f"i{k}", "int") for k in range(20)]
            + [(f"f{k}", "float") for k in range(20)]
            + [(f"s{k}", "string") for k in range(20)]
            + [(f"t{k}", "timestamp") for k in range(5)]
        )
        return Schema(fields), [1] * 20 + [1.0] * 20 + ["x"] * 20 + [123] * 5

    def test_openmldb_row_is_255_bytes(self):
        sch, vals = self._schema_vals()
        assert row_size(sch, vals) == 255

    def test_spark_row_is_556_bytes(self):
        sch, vals = self._schema_vals()
        assert spark_unsaferow_size(sch, vals) == 556

    def test_memory_saving_exceeds_54_percent(self):
        sch, vals = self._schema_vals()
        saving = 1 - row_size(sch, vals) / spark_unsaferow_size(sch, vals)
        assert saving > 0.54


class TestRedisModel:
    def test_jemalloc_rounds_to_class(self):
        assert jemalloc_bin(1) == 8
        assert jemalloc_bin(17) == 32
        assert jemalloc_bin(100) == 112
        assert jemalloc_bin(5000) == 8192

    def test_jemalloc_monotone(self):
        sizes = [jemalloc_bin(n) for n in range(1, 2000)]
        assert all(a <= b for a, b in zip(sizes, sizes[1:]))
        assert all(jemalloc_bin(n) >= n for n in range(1, 2000))

    def test_sds_includes_header_and_nul(self):
        assert sds_bytes(3) == jemalloc_bin(8)

    def test_row_overhead_exceeds_payload(self):
        assert redis_row_overhead(85) > 85

    def test_key_overhead_positive(self):
        assert redis_key_overhead() > 100
