"""Provided synth_data module + its temporal-graph extension."""
import pytest

from repro import synth_data


def test_tpch_lite_generators(spark):
    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    o = synth_data.orders(spark, sf=0.001, seed=1)
    assert li.count() > 0 and o.count() > 0
    assert "l_orderkey" in li.columns and "o_orderkey" in o.columns


def test_zipf_and_uniform_keys(spark):
    z = synth_data.zipf_keys(spark, n=500, n_keys=50, seed=3)
    u = synth_data.uniform_keys(spark, n=500, n_keys=50, seed=4)
    assert z.count() == 500 and u.count() == 500


def test_temporal_edges_analog(spark):
    df = synth_data.temporal_edges(spark, name="email", sf=0.05, seed=7)
    assert set(df.columns) == {"u", "v", "t"}
    assert df.count() > 0


def test_temporal_edges_random(spark):
    df = synth_data.temporal_edges_random(spark, n_vertices=20, n_edges=40, seed=1)
    assert set(df.columns) == {"u", "v", "t"}
    rows = df.collect()
    assert all(r["u"] < r["v"] for r in rows)
