"""Unit tests for the LocalEngine / SparkEngine parity layer."""
import numpy as np
import pandas as pd
import pytest

from repro.core.combos import FeatureCombo
from repro.core.engine import LocalEngine, SparkEngine
from repro.core.plan import FeatureSpec


@pytest.fixture(scope="module")
def pdf():
    rng = np.random.default_rng(0)
    n = 2000
    y = rng.integers(0, 2, n)
    return pd.DataFrame(
        {
            "a": y + rng.normal(0, 0.8, n),
            "b": rng.normal(size=n),
            "c": y + rng.normal(0, 2.0, n),
            "label": y,
        }
    )


def test_local_feature_columns(pdf):
    eng = LocalEngine(pdf, "label")
    assert eng.feature_columns == ["a", "b", "c"]


def test_local_add_generated_and_chain(pdf):
    eng = LocalEngine(pdf, "label")
    s1 = FeatureSpec("mul", ("a", "b"))
    s2 = FeatureSpec("add", (s1.name, "c"))  # depends on s1 within same batch
    eng.add_generated([s1, s2])
    np.testing.assert_allclose(eng.pdf[s1.name], pdf["a"] * pdf["b"])
    np.testing.assert_allclose(eng.pdf[s2.name], pdf["a"] * pdf["b"] + pdf["c"])


def test_local_add_generated_idempotent(pdf):
    eng = LocalEngine(pdf, "label")
    s1 = FeatureSpec("mul", ("a", "b"))
    eng.add_generated([s1])
    eng.add_generated([s1])  # second call is a no-op
    assert list(eng.pdf.columns).count(s1.name) == 1


def test_local_gbdt_trains_on_subset(pdf):
    eng = LocalEngine(pdf, "label")
    model = eng.fit_gbdt(["a", "b"], n_estimators=5, max_depth=2)
    assert model.n_features_ == 2
    assert 0 in model.split_features()  # "a" is the informative one


def test_local_iv_and_corr_consistency(pdf):
    eng = LocalEngine(pdf, "label")
    iv = eng.iv(["a", "b", "c"])
    assert iv["a"] > iv["c"] > iv["b"]
    corr = eng.corr(["a", "c"])
    assert corr.shape == (2, 2)
    assert corr[0, 1] == pytest.approx(np.corrcoef(pdf["a"], pdf["c"])[0, 1])


def test_local_gain_ratios_positional_indexing(pdf):
    eng = LocalEngine(pdf, "label")
    combo = FeatureCombo((0,), ((0.5,),))  # index 0 of the cols list below
    (r_a,) = eng.gain_ratios(["a", "b"], [combo])
    (r_b,) = eng.gain_ratios(["b", "a"], [combo])
    assert r_a > r_b  # same combo, different positional meaning


def test_spark_engine_parity(spark, pdf):
    sdf = spark.createDataFrame(pdf)
    local = LocalEngine(pdf, "label")
    dist = SparkEngine(sdf, "label")
    try:
        assert dist.feature_columns == local.feature_columns
        iv_l = local.iv(["a", "b", "c"])
        iv_d = dist.iv(["a", "b", "c"])
        for c in ("a", "b", "c"):
            assert iv_d[c] == pytest.approx(iv_l[c], abs=0.05)
        np.testing.assert_allclose(
            dist.corr(["a", "b", "c"]), local.corr(["a", "b", "c"]), atol=1e-8
        )
        combo = FeatureCombo((0, 2), ((0.5,), (0.5,)))
        np.testing.assert_allclose(
            dist.gain_ratios(["a", "b", "c"], [combo]),
            local.gain_ratios(["a", "b", "c"], [combo]),
            rtol=1e-9,
        )
    finally:
        dist.df.unpersist()


def test_spark_add_generated(spark, pdf):
    sdf = spark.createDataFrame(pdf)
    eng = SparkEngine(sdf, "label")
    try:
        s1 = FeatureSpec("mul", ("a", "b"))
        s2 = FeatureSpec("add", (s1.name, "c"))
        eng.add_generated([s1, s2])
        out = eng.df.select(s1.name, s2.name, "a", "b", "c").toPandas()
        np.testing.assert_allclose(out[s1.name], out["a"] * out["b"], rtol=1e-12)
        np.testing.assert_allclose(
            out[s2.name], out["a"] * out["b"] + out["c"], rtol=1e-12
        )
    finally:
        eng.df.unpersist()
