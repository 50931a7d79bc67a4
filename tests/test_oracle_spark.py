"""Oracle-backed checks of Spark aggregation idioms used by the pipeline,
run over the provided TPC-H-lite generators so the shuffle path of the
session (broadcast joins disabled) is exercised at small SF."""
import numpy as np
import pandas as pd
from pyspark.sql import functions as F

from repro import synth_data
from repro.core.plan import FeaturePlan, FeatureSpec
from repro.oracle import assert_equivalent


def test_groupby_aggregation_matches_duckdb(spark):
    li = synth_data.lineitem(spark, sf=0.002)
    got = (
        li.groupBy("l_returnflag")
        .agg(
            F.count("*").alias("cnt"),
            F.round(F.sum("l_quantity"), 4).alias("qty"),
        )
    )
    assert_equivalent(
        got,
        "SELECT l_returnflag, COUNT(*) AS cnt, ROUND(SUM(l_quantity), 4) AS qty "
        "FROM lineitem GROUP BY l_returnflag",
        lineitem=li,
    )


def test_join_aggregation_matches_duckdb(spark):
    li = synth_data.lineitem(spark, sf=0.002)
    o = synth_data.orders(spark, sf=0.002)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("cnt"))
    )
    assert_equivalent(
        got,
        "SELECT o_orderpriority, COUNT(*) AS cnt FROM lineitem "
        "JOIN orders ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
        lineitem=li,
        orders=o,
    )


def test_generated_feature_aggregate_matches_duckdb(spark):
    """Ψ applied on Spark, aggregated, vs DuckDB computing the same
    generated feature in SQL — end-to-end check of the serving path."""
    li = synth_data.lineitem(spark, sf=0.002)
    plan = FeaturePlan(
        [FeatureSpec("mul", ("l_extendedprice", "l_discount"))],
        ["l_extendedprice_l_discount__mul"],
    )
    got = plan.apply_spark(li).agg(
        F.round(F.sum("l_extendedprice_l_discount__mul"), 2).alias("revenue")
    )
    assert_equivalent(
        got,
        "SELECT ROUND(SUM(l_extendedprice * l_discount), 2) AS revenue FROM lineitem",
        lineitem=li,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=20_000, n_keys=100, alpha=1.2)
    counts = df.groupBy("k").count().toPandas().sort_values("count", ascending=False)
    top = counts["count"].iloc[0]
    assert top > 3 * counts["count"].median()


def test_pipeline_on_tpch_derived_label(spark):
    """SAFE runs end-to-end on a frame whose label comes from a TPC-H-lite
    business rule (price × discount interaction)."""
    from repro.core.pipeline import SafePipeline

    pdf = synth_data.lineitem(spark, sf=0.002).toPandas()
    feats = pdf[["l_quantity", "l_extendedprice", "l_discount", "l_tax"]].copy()
    rng = np.random.default_rng(0)
    revenue = pdf["l_extendedprice"] * pdf["l_discount"]
    feats["label"] = (revenue + rng.normal(0, revenue.std() * 0.3, len(pdf)) > revenue.median()).astype(int)
    plan = SafePipeline(gamma=4, top_k=8).fit(feats, "label")
    gen = " ".join(plan.generated_outputs())
    assert "l_extendedprice" in gen and "l_discount" in gen
