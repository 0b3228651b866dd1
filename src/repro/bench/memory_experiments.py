"""Table 2 experiment: memory used by OpenMLDB vs Redis for N TalkingData
tuples indexed by ``ip``.

The paper measured a Jedis-loaded Redis against OpenMLDB on the Kaggle
TalkingData stream (184,903,890 clicks, ~277k distinct ips). We compute
both sides from byte-exact models (see ``repro.storage``): the OpenMLDB
side uses the *real* row codec for the payload plus the paper's own
Section 8.1 formula for index nodes, and is verified against actual
``encode_row`` output at the small sizes; the Redis side is the
documented hash-per-ip layout model. Distinct-key counts follow the
expected-uniques curve of a Zipf(1.05) draw over 277,396 ips — the
TalkingData key profile.
"""
from __future__ import annotations

import numpy as np

from repro.storage.encoding import encode_row
from repro.storage.memory_model import (
    TALKINGDATA_SCHEMA,
    OpenMLDBTableModel,
    RedisTableModel,
)
from repro.synth_data import talkingdata_pdf

#: distinct ip count of the full TalkingData dataset.
TALKINGDATA_N_IPS = 277_396
#: full dataset size (the last Table 2 row).
TALKINGDATA_N_ROWS = 184_903_890

#: Table 2 as printed in the paper: n_tuples -> (redis_bytes, openmldb_bytes).
PAPER_TABLE2 = {
    10_000: (9_272_328, 2_339_699),
    100_000: (48_501_288, 15_624_290),
    1_000_000: (215_323_024, 105_722_441),
    10_000_000: (1_897_343_984, 1_008_276_458),
    184_903_890: (34_071_049_864, 18_513_271_540),
}


def expected_unique_keys(n_tuples: int, *, n_ips: int = TALKINGDATA_N_IPS, alpha: float = 1.05) -> int:
    """E[#distinct keys] after ``n_tuples`` Zipf(alpha) draws over n_ips keys.

    E[unique] = Σ_k (1 - (1 - p_k)^n), evaluated in log-space for numeric
    stability — the standard occupancy formula.
    """
    ranks = np.arange(1, n_ips + 1, dtype="float64")
    w = ranks**-alpha
    p = w / w.sum()
    missing = np.exp(n_tuples * np.log1p(-p))
    return int(round(float((1.0 - missing).sum())))


def verify_row_bytes_against_codec(n_sample: int = 2_000) -> tuple[int, float]:
    """Encode real synthetic TalkingData rows; return (model_bytes,
    mean measured bytes). The schema is all fixed-width, so the two must
    be equal — pinned by a test and printed by the job for transparency."""
    model = OpenMLDBTableModel()
    pdf = talkingdata_pdf(n=n_sample)
    sizes = [
        len(encode_row(TALKINGDATA_SCHEMA, list(row)))
        for row in pdf.itertuples(index=False)
    ]
    return model.row_bytes(), float(np.mean(sizes))


def table2_rows(sizes: tuple[int, ...] = tuple(PAPER_TABLE2)) -> list[dict]:
    """One dict per Table 2 row: measured bytes, reduction, paper numbers."""
    om, rd = OpenMLDBTableModel(), RedisTableModel()
    rows = []
    for n in sizes:
        nk = expected_unique_keys(n)
        redis_b = rd.total_bytes(n, nk)
        omldb_b = om.total_bytes(n, nk)
        paper_redis, paper_om = PAPER_TABLE2.get(n, (None, None))
        row = {
            "#-Tuples": n,
            "n_keys": nk,
            "RedisMem": redis_b,
            "OpenMLDB Mem": omldb_b,
            "Reduction": f"{100 * (1 - omldb_b / redis_b):.2f}%",
        }
        if paper_redis is not None:
            row["Paper Redis"] = paper_redis
            row["Paper OpenMLDB"] = paper_om
            row["Paper Reduction"] = f"{100 * (1 - paper_om / paper_redis):.2f}%"
        rows.append(row)
    return rows
