"""Unit tests for the provided TPC-H-lite generators (kept as the oracle
workload for Spark-side correctness tests)."""
import numpy as np

from repro import synth_data


def test_lineitem_schema_and_size(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    assert li.count() == 6000
    assert {"l_orderkey", "l_quantity", "l_extendedprice", "l_shipdate"} <= set(
        li.columns
    )


def test_orders_keys_sequential(spark):
    o = synth_data.orders(spark, sf=0.001).toPandas()
    assert o["o_orderkey"].min() == 1
    assert o["o_orderkey"].is_unique


def test_lineitem_deterministic_in_seed(spark):
    a = synth_data.lineitem(spark, sf=0.0005, seed=7).toPandas()
    b = synth_data.lineitem(spark, sf=0.0005, seed=7).toPandas()
    assert a.equals(b)
    c = synth_data.lineitem(spark, sf=0.0005, seed=8).toPandas()
    assert not a.equals(c)


def test_uniform_keys_range(spark):
    df = synth_data.uniform_keys(spark, n=5000, n_keys=50).toPandas()
    assert df["k"].between(1, 50).all()
    counts = df["k"].value_counts()
    assert counts.max() < 3 * counts.min()


def test_customer_and_part_shapes(spark):
    c = synth_data.customer(spark, sf=0.01)
    p = synth_data.part(spark, sf=0.01)
    assert c.count() == 1500
    assert p.count() == 2000
    assert np.isfinite(c.toPandas()["c_acctbal"]).all()
