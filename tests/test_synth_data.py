"""Tests for the provided TPC-H-lite generators and the bipartite entry
point added for this paper."""
import pandas as pd
import pytest

from repro import synth_data


@pytest.mark.parametrize("table", ["lineitem", "orders", "customer", "part"])
def test_tpch_lite_nonempty(spark, table):
    df = getattr(synth_data, table)(spark, sf=0.001)
    assert df.count() > 0


@pytest.mark.parametrize(
    "table,key",
    [("lineitem", "l_orderkey"), ("orders", "o_orderkey"),
     ("customer", "c_custkey"), ("part", "p_partkey")],
)
def test_tpch_lite_schema_has_key(spark, table, key):
    df = getattr(synth_data, table)(spark, sf=0.001)
    assert key in df.columns


@pytest.mark.parametrize("table", ["lineitem", "orders"])
def test_tpch_lite_deterministic(spark, table):
    a = getattr(synth_data, table)(spark, sf=0.001).toPandas()
    b = getattr(synth_data, table)(spark, sf=0.001).toPandas()
    pd.testing.assert_frame_equal(a, b)


def test_tpch_lite_sf_scales(spark):
    small = synth_data.orders(spark, sf=0.001).count()
    large = synth_data.orders(spark, sf=0.002).count()
    assert large == 2 * small


@pytest.mark.parametrize("fn", ["zipf_keys", "uniform_keys"])
def test_key_generators(spark, fn):
    df = getattr(synth_data, fn)(spark, n=500, n_keys=40)
    pdf = df.toPandas()
    assert len(pdf) == 500
    assert pdf["k"].between(1, 40).all()


def test_zipf_keys_skewed(spark):
    pdf = synth_data.zipf_keys(spark, n=3000, n_keys=50).toPandas()
    top = pdf["k"].value_counts().iloc[0]
    assert top > 3000 / 50 * 3  # hot key far above uniform share


@pytest.mark.parametrize("name", ["it", "de", "or", "lj", "en", "tr"])
def test_bipartite_edges_entry_point(spark, name):
    df = synth_data.bipartite_edges(spark, name, "tiny")
    assert set(df.columns) == {"u", "v"}
    assert df.count() > 0


def test_bipartite_edges_scale_monotonic(spark):
    tiny = synth_data.bipartite_edges(spark, "it", "tiny").count()
    unit = synth_data.bipartite_edges(spark, "it", "unit").count()
    assert unit > tiny
