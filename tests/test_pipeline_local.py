"""Integration tests: SAFE pipeline, local engine."""
import numpy as np
import pandas as pd
import pytest

from repro.core.pipeline import SafePipeline
from repro.models import make_classifier
from repro.models.evaluation import auc_score


@pytest.fixture(scope="module")
def planted():
    """Label driven by f0·f1 and f2/f3 plus weak marginals."""
    rng = np.random.default_rng(11)
    n = 4000
    X = rng.normal(size=(n, 8))
    logit = (
        2.5 * X[:, 0] * X[:, 1]
        + 1.5 * X[:, 2] / (np.abs(X[:, 3]) + 0.5)
        + 0.4 * (X[:, 0] + X[:, 1] + X[:, 2])
    )
    y = (rng.random(n) < 1 / (1 + np.exp(-logit))).astype(int)
    pdf = pd.DataFrame(X, columns=[f"f{i}" for i in range(8)])
    pdf["label"] = y
    return pdf.iloc[:3000].reset_index(drop=True), pdf.iloc[3000:].reset_index(drop=True)


@pytest.fixture(scope="module")
def fitted(planted):
    train, _test = planted
    pipe = SafePipeline()
    plan = pipe.fit(train, "label")
    return pipe, plan


def test_plan_size_capped_at_2m(fitted):
    _pipe, plan = fitted
    assert 0 < len(plan.output_columns) <= 16  # 2·M with M=8


def test_generates_the_planted_interaction(fitted):
    _pipe, plan = fitted
    gen = set(plan.generated_outputs())
    assert any("f0_f1__mul" == g or "f0" in g and "f1" in g for g in gen)


def test_report_populated(fitted):
    pipe, _plan = fitted
    assert pipe.report_ is not None
    assert len(pipe.report_.iterations) == 1
    it = pipe.report_.iterations[0]
    assert it["n_combos"] > 0
    assert it["n_generated"] > 0
    assert it["n_selected"] == it["n_selected"]


def test_improves_linear_model(planted, fitted):
    train, test = planted
    _pipe, plan = fitted
    ftr, fte = plan.apply_pandas(train), plan.apply_pandas(test)

    def lr_auc(tr, te):
        m = make_classifier("LR").fit(
            tr.drop(columns="label").to_numpy(), tr["label"].to_numpy()
        )
        return auc_score(
            te["label"].to_numpy(), m.predict_proba(te.drop(columns="label").to_numpy())[:, 1]
        )

    assert lr_auc(ftr, fte) > lr_auc(train, test) + 0.05


def test_plan_applies_to_unseen_frame(planted, fitted):
    _train, test = planted
    _pipe, plan = fitted
    out = plan.apply_pandas(test)
    assert list(out.columns) == plan.output_columns + ["label"]
    assert np.isfinite(out.drop(columns="label").to_numpy()).all()


def test_multiple_iterations_run(planted):
    train, _test = planted
    pipe = SafePipeline(n_iterations=2, gamma=6, top_k=12)
    plan = pipe.fit(train, "label")
    assert 1 <= len(pipe.report_.iterations) <= 2
    assert plan.output_columns


def test_second_iteration_can_compose_features(planted):
    """Iteration 2 may build on iteration-1 outputs (chained specs)."""
    train, _test = planted
    pipe = SafePipeline(n_iterations=2, gamma=8, top_k=10)
    plan = pipe.fit(train, "label")
    # plan must still apply cleanly even with chained dependencies
    out = plan.apply_pandas(train)
    assert np.isfinite(out.drop(columns="label").to_numpy()).all()


def test_time_budget_stops_early(planted):
    train, _test = planted
    pipe = SafePipeline(n_iterations=50, time_budget_s=0.0)
    plan = pipe.fit(train, "label")
    assert len(pipe.report_.iterations) == 0
    # with zero budget the plan is the identity over the original features
    assert plan.output_columns == [c for c in train.columns if c != "label"]


def test_spark_input_with_local_engine(spark, planted):
    train, _test = planted
    sdf = spark.createDataFrame(train)
    plan = SafePipeline().fit(sdf, "label", engine="local")
    assert plan.output_columns


def test_valid_frame_concatenated(planted):
    train, test = planted
    plan = SafePipeline().fit(train.iloc[:2000], "label", valid=train.iloc[2000:])
    assert plan.output_columns


def test_deterministic_given_seed(planted):
    train, _test = planted
    p1 = SafePipeline().fit(train, "label")
    p2 = SafePipeline().fit(train, "label")
    assert p1.output_columns == p2.output_columns
    assert p1.specs == p2.specs
