"""Benchmark: Table 2 — byte models and the row codec's encode rate.

The table itself is analytic (see ``jobs/table2_memory.py``); the
benchmark times the real codec encoding TalkingData rows (the operation
whose output the model is built on) and the full table-model evaluation.
"""
import pytest

from repro.bench.memory_experiments import table2_rows
from repro.storage.encoding import Schema, encode_row
from repro.storage.memory_model import TALKINGDATA_SCHEMA
from repro.synth_data import talkingdata_pdf


@pytest.fixture(scope="module")
def td_rows():
    pdf = talkingdata_pdf(n=5_000)
    return [list(r) for r in pdf.itertuples(index=False)]


def test_encode_talkingdata_rows(benchmark, td_rows):
    """Encode 5k TalkingData rows with the compact codec."""

    def encode_all():
        return sum(len(encode_row(TALKINGDATA_SCHEMA, r)) for r in td_rows)

    total = benchmark(encode_all)
    assert total == 39 * len(td_rows)


def test_table2_model_rows(benchmark):
    """Evaluate the full Table 2 (all five sizes, expected-uniques curve)."""
    rows = benchmark(table2_rows)
    assert len(rows) == 5
    # Shape of the paper's Table 2: savings everywhere, decreasing with N.
    reductions = [float(r["Reduction"].rstrip("%")) for r in rows]
    assert all(r > 30 for r in reductions)
    assert reductions[0] > reductions[-1]
