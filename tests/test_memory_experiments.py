"""Tests for the Table 2 experiment pipeline (repro.bench.memory_experiments)."""
import pytest

from repro.bench.memory_experiments import (
    PAPER_TABLE2,
    TALKINGDATA_N_IPS,
    expected_unique_keys,
    table2_rows,
    verify_row_bytes_against_codec,
)


class TestExpectedUniques:
    def test_monotone_in_n(self):
        ks = [expected_unique_keys(n) for n in (1_000, 10_000, 100_000, 1_000_000)]
        assert ks == sorted(ks)

    def test_bounded_by_population(self):
        assert expected_unique_keys(10**9) <= TALKINGDATA_N_IPS

    def test_full_dataset_saturates(self):
        # 185M draws over 277k keys: nearly every ip observed.
        assert expected_unique_keys(184_903_890) > 0.95 * TALKINGDATA_N_IPS

    def test_small_sample_mostly_distinct_keys_missing(self):
        assert expected_unique_keys(10_000) < TALKINGDATA_N_IPS / 10


class TestTable2Pipeline:
    def test_codec_matches_model_exactly(self):
        model_bytes, measured_mean = verify_row_bytes_against_codec(500)
        assert model_bytes == 39
        assert measured_mean == pytest.approx(39.0)

    def test_rows_cover_paper_sizes(self):
        rows = table2_rows()
        assert [r["#-Tuples"] for r in rows] == list(PAPER_TABLE2)

    def test_reduction_shape_matches_paper(self):
        rows = table2_rows()
        red = [float(r["Reduction"].rstrip("%")) for r in rows]
        paper = [float(r["Paper Reduction"].rstrip("%")) for r in rows]
        # Same qualitative shape: strictly positive savings, biggest at the
        # smallest size, within 20 points of the paper at every row.
        assert all(m > 0 for m in red)
        assert red[0] == max(red)
        for m, p in zip(red, paper):
            assert abs(m - p) < 20, (m, p)

    def test_redis_bytes_within_factor_of_paper(self):
        for r in table2_rows():
            assert 0.5 < r["RedisMem"] / r["Paper Redis"] < 2.0
            assert 0.5 < r["OpenMLDB Mem"] / r["Paper OpenMLDB"] < 2.0
