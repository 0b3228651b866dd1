"""Tests for the Section 8.1 memory estimation model and Table 2 models."""
import pytest

from repro.storage.memory_model import (
    IndexSpec,
    OpenMLDBTableModel,
    RedisTableModel,
    TableSpec,
    estimate_table_bytes,
    estimate_total_bytes,
    recommend_storage,
)


def paper_example() -> TableSpec:
    return TableSpec(
        n_rows=1_000_000,
        row_len=300,
        indexes=(IndexSpec(1_000_000, 16), IndexSpec(1_000_000, 16)),
        n_replicas=2,
        table_type="latest",
        k_copies=1,
    )


class TestFormula:
    def test_paper_worked_example_is_1_568_gb(self):
        assert estimate_table_bytes(paper_example()) == pytest.approx(1.568e9)

    def test_replicas_scale_linearly(self):
        one = TableSpec(n_rows=10, row_len=100, indexes=(IndexSpec(10, 8),), n_replicas=1)
        two = TableSpec(n_rows=10, row_len=100, indexes=(IndexSpec(10, 8),), n_replicas=2)
        assert estimate_table_bytes(two) == 2 * estimate_table_bytes(one)

    def test_absolute_tables_cost_more_per_row(self):
        lat = TableSpec(n_rows=1000, row_len=100, indexes=(IndexSpec(10, 8),), table_type="latest")
        ab = TableSpec(n_rows=1000, row_len=100, indexes=(IndexSpec(10, 8),), table_type="absolute")
        assert estimate_table_bytes(ab) - estimate_table_bytes(lat) == 1000 * 4

    def test_k_copies_bounds_enforced(self):
        with pytest.raises(ValueError):
            TableSpec(n_rows=1, row_len=1, indexes=(IndexSpec(1, 1),), k_copies=2)

    def test_unknown_table_type_rejected(self):
        with pytest.raises(ValueError):
            TableSpec(n_rows=1, row_len=1, indexes=(), table_type="weird")

    def test_total_sums_tables(self):
        t = TableSpec(n_rows=10, row_len=100, indexes=(IndexSpec(10, 8),))
        assert estimate_total_bytes([t, t]) == 2 * estimate_table_bytes(t)


class TestAdvisor:
    def test_fits_and_low_latency_gives_memory(self):
        t = TableSpec(n_rows=1000, row_len=100, indexes=(IndexSpec(10, 8),))
        assert recommend_storage(t, available_bytes=1e9, latency_budget_ms=10) == "memory"

    def test_exceeds_memory_gives_disk(self):
        t = paper_example()
        assert recommend_storage(t, available_bytes=1e6, latency_budget_ms=10) == "disk"

    def test_relaxed_latency_gives_disk(self):
        t = TableSpec(n_rows=1000, row_len=100, indexes=(IndexSpec(10, 8),))
        assert recommend_storage(t, available_bytes=1e9, latency_budget_ms=25) == "disk"


class TestTable2Models:
    """Shape assertions behind Table 2 — exact rows live in the bench."""

    def test_openmldb_beats_redis_at_every_scale(self):
        om, rd = OpenMLDBTableModel(), RedisTableModel()
        for n, nk in [(10_000, 5_000), (1_000_000, 120_000), (184_903_890, 277_396)]:
            assert om.total_bytes(n, nk) < rd.total_bytes(n, nk)

    def test_reduction_decreases_with_scale(self):
        # Paper Table 2: 74.77% at 10K tuples falling toward ~45% at 185M.
        om, rd = OpenMLDBTableModel(), RedisTableModel()
        small = 1 - om.total_bytes(10_000, 5_000) / rd.total_bytes(10_000, 5_000)
        big = 1 - om.total_bytes(184_903_890, 277_396) / rd.total_bytes(184_903_890, 277_396)
        assert small > 0.6
        assert 0.3 < big < 0.6
        assert small > big

    def test_row_bytes_from_real_codec(self):
        om = OpenMLDBTableModel()
        assert 30 < om.row_bytes() < 60  # 7-column TalkingData row

    def test_total_monotone_in_tuples(self):
        om = OpenMLDBTableModel()
        assert om.total_bytes(2_000, 100) > om.total_bytes(1_000, 100)
