"""Tests for the synthetic data generators (provided + paper extensions)."""
import numpy as np
import pytest

from repro import synth_data as sd


class TestStreamTables:
    def test_events_schema(self):
        pdf = sd.events_pdf(n=100, n_users=5)
        assert list(pdf.columns) == ["userid", "ts", "etype", "price", "quantity", "category"]
        assert pdf["ts"].dtype == np.int64

    def test_events_timestamps_strictly_increasing(self):
        ts = sd.events_pdf(n=5_000, n_users=5)["ts"].to_numpy()
        assert (np.diff(ts) > 0).all()

    def test_orders_timestamps_strictly_increasing(self):
        ts = sd.orders_stream_pdf(n=5_000, n_users=5)["ts"].to_numpy()
        assert (np.diff(ts) > 0).all()

    def test_events_deterministic_in_seed(self):
        a = sd.events_pdf(n=200, n_users=5, seed=9)
        b = sd.events_pdf(n=200, n_users=5, seed=9)
        assert a.equals(b)
        c = sd.events_pdf(n=200, n_users=5, seed=10)
        assert not a.equals(c)

    def test_zipf_alpha_skews_keys(self):
        uni = sd.events_pdf(n=20_000, n_users=100, alpha=0.0)
        skw = sd.events_pdf(n=20_000, n_users=100, alpha=1.3)
        top_uni = uni["userid"].value_counts().iloc[0]
        top_skw = skw["userid"].value_counts().iloc[0]
        assert top_skw > 5 * top_uni

    def test_talkingdata_schema_and_keys(self):
        pdf = sd.talkingdata_pdf(n=5_000)
        assert {"ip", "app", "device", "os", "channel", "click_time", "is_attributed"} == set(pdf.columns)
        # many tuples share the same ip key (the Table 2 precondition)
        assert pdf["ip"].nunique() < len(pdf) / 5
        assert (np.diff(pdf["click_time"].to_numpy()) >= 0).all()

    def test_events_spark_roundtrip(self, spark):
        df = sd.events(spark, n=50, n_users=3)
        assert df.count() == 50
        assert set(df.columns) == {"userid", "ts", "etype", "price", "quantity", "category"}


class TestProvidedGenerators:
    def test_lineitem_rowcount_scales(self, spark):
        assert sd.lineitem(spark, sf=0.001).count() == 6_000

    def test_zipf_keys_skewed(self, spark):
        pdf = sd.zipf_keys(spark, n=10_000, n_keys=100, alpha=1.3).toPandas()
        counts = pdf["k"].value_counts()
        assert counts.iloc[0] > 10 * counts.iloc[len(counts) // 2]
