"""Unit tests for the 9-classifier sklearn substrate."""
import numpy as np
import pytest

from repro.models import CLASSIFIERS, make_classifier
from repro.models.evaluation import auc_score

SEEDED = {"AB", "DT", "ET", "MLP", "RF", "XGB"}


@pytest.fixture(scope="module")
def linear_data():
    """Linearly separable-ish problem every model must handle."""
    rng = np.random.default_rng(0)
    X = rng.normal(size=(1500, 6))
    logit = 2.0 * X[:, 0] - 1.5 * X[:, 1] + 0.5 * X[:, 2]
    y = (rng.random(1500) < 1 / (1 + np.exp(-logit))).astype(int)
    return X[:1000], y[:1000], X[1000:], y[1000:]


@pytest.mark.parametrize("name", sorted(CLASSIFIERS))
def test_learns_linear_signal(name, linear_data):
    Xtr, ytr, Xte, yte = linear_data
    m = make_classifier(name).fit(Xtr, ytr)
    auc = auc_score(yte, m.predict_proba(Xte)[:, 1])
    assert auc > 0.78, f"{name} AUC {auc:.3f}"


@pytest.mark.parametrize("name", sorted(CLASSIFIERS))
def test_proba_shape_and_range(name, linear_data):
    Xtr, ytr, Xte, _ = linear_data
    m = make_classifier(name).fit(Xtr, ytr)
    p = m.predict_proba(Xte)
    assert p.shape == (len(Xte), 2)
    assert np.all(p >= -1e-9) and np.all(p <= 1 + 1e-9)
    np.testing.assert_allclose(p.sum(axis=1), 1.0, atol=1e-6)


@pytest.mark.parametrize("name", sorted(CLASSIFIERS))
def test_predict_binary(name, linear_data):
    Xtr, ytr, Xte, _ = linear_data
    m = make_classifier(name).fit(Xtr, ytr)
    pred = m.predict(Xte)
    assert set(np.unique(pred)) <= {0, 1}


@pytest.mark.parametrize("name", sorted(SEEDED))
def test_deterministic_given_seed(name, linear_data):
    Xtr, ytr, Xte, _ = linear_data
    p1 = make_classifier(name, random_state=5).fit(Xtr, ytr).predict_proba(Xte)
    p2 = make_classifier(name, random_state=5).fit(Xtr, ytr).predict_proba(Xte)
    np.testing.assert_allclose(p1, p2)


def test_unknown_classifier_raises():
    with pytest.raises(KeyError):
        make_classifier("GPT")


@pytest.mark.parametrize("name", ["RF", "ET", "XGB", "MLP", "kNN"])
def test_nonlinear_models_beat_linear_on_interaction(name):
    """Tree/NN/kNN models should beat LR on a pure product label."""
    rng = np.random.default_rng(1)
    X = rng.normal(size=(2500, 4))
    y = (X[:, 0] * X[:, 1] > 0).astype(int)
    Xtr, ytr, Xte, yte = X[:1800], y[:1800], X[1800:], y[1800:]
    lr = auc_score(
        yte, make_classifier("LR").fit(Xtr, ytr).predict_proba(Xte)[:, 1]
    )
    other = auc_score(
        yte, make_classifier(name).fit(Xtr, ytr).predict_proba(Xte)[:, 1]
    )
    assert other > lr + 0.1


def test_knn_matches_manual_small_case():
    X = np.array([[0.0], [1.0], [10.0], [11.0]])
    y = np.array([0, 0, 1, 1])
    m = make_classifier("kNN", n_neighbors=1).fit(X, y)
    np.testing.assert_allclose(m.predict_proba(np.array([[0.4], [10.6]]))[:, 1], [0, 1])


def test_decision_tree_pure_leaf_probabilities():
    X = np.array([[0.0], [0.1], [5.0], [5.1]])
    y = np.array([0, 0, 1, 1])
    m = make_classifier("DT", max_depth=2).fit(X, y)
    p = m.predict_proba(X)[:, 1]
    np.testing.assert_allclose(p, y.astype(float))


def test_adaboost_weights_concentrate_on_hard_examples():
    """AB must fit a 1-D two-threshold problem a single stump cannot."""
    rng = np.random.default_rng(2)
    x = rng.uniform(-3, 3, 2000)
    y = ((x > -1) & (x < 1)).astype(int)
    m = make_classifier("AB").fit(x[:, None], y)
    pred = m.predict(x[:, None])
    assert (pred == y).mean() > 0.9


def test_logistic_regression_coefficient_direction(linear_data):
    Xtr, ytr, _X, _y = linear_data
    m = make_classifier("LR").fit(Xtr, ytr)
    assert m.w_[0] > 0 and m.w_[1] < 0


def test_svm_margin_sign(linear_data):
    Xtr, ytr, Xte, yte = linear_data
    m = make_classifier("SVM").fit(Xtr, ytr)
    s = m.decision_function(Xte)
    assert auc_score(yte, s) > 0.8


def test_constant_feature_columns_tolerated():
    rng = np.random.default_rng(3)
    X = np.column_stack([rng.normal(size=300), np.ones(300)])
    y = (X[:, 0] > 0).astype(int)
    for name in sorted(CLASSIFIERS):
        m = make_classifier(name).fit(X, y)
        p = m.predict_proba(X)
        assert np.isfinite(p).all(), name
