"""Smoke tests for the provided TPC-H-lite generators (kept exercised
even though the paper's evaluation is graph-based — the graph
generators in repro.graphs extend this module per the session brief)."""
import pytest

from repro import synth_data


def test_lineitem_shape(spark):
    df = synth_data.lineitem(spark, sf=0.001)
    assert df.count() == 6000
    assert "l_orderkey" in df.columns


def test_orders_deterministic(spark):
    a = synth_data.orders(spark, sf=0.001).toPandas()
    b = synth_data.orders(spark, sf=0.001).toPandas()
    assert a.equals(b)


def test_zipf_keys_skew(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
    top = df["k"].value_counts().iloc[0]
    assert top > 5000 / 100 * 3, "zipf head must be heavily loaded"


def test_uniform_keys_range(spark):
    df = synth_data.uniform_keys(spark, n=1000, n_keys=50).toPandas()
    assert df["k"].between(1, 50).all()
