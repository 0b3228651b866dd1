"""Job: reproduce Figures 15–17 (hyper-parameter sweeps: #windows,
window size, #LAST JOINs)."""
import os
import sys

sys.path.insert(0, os.path.dirname(__file__))
from _common import emit, get_spark, rows_to_df  # noqa: E402

from repro.bench.harness import print_table  # noqa: E402
from repro.bench.online_experiments import fig15_17_hyperparams  # noqa: E402
from pyspark.sql import DataFrame, SparkSession  # noqa: E402


def run(spark: SparkSession) -> DataFrame:
    out = fig15_17_hyperparams()
    print_table("Figure 15: number of windows", out["windows"])
    print_table("Figure 16: data volume per window", out["window_rows"])
    print_table("Figure 17: number of LAST JOINs", out["joins"])
    flat = (
        [{"sweep": "windows", **r} for r in out["windows"]]
        + [{"sweep": "window_rows", **r} for r in out["window_rows"]]
        + [{"sweep": "joins", **r} for r in out["joins"]]
    )
    return rows_to_df(spark, flat)


if __name__ == "__main__":
    run(get_spark("fig15_17_hyperparams"))
