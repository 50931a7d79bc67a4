"""scikit-learn substrate: the 9 evaluation classifiers of Tables III/VIII.

``make_classifier(abbr)`` builds a fresh model by the paper's abbreviation
(AB, DT, ET, kNN, LR, MLP, RF, SVM, XGB); every model exposes
``fit(X, y)`` and ``predict_proba(X)``.
"""
from __future__ import annotations

from ..gbdt import GBDTClassifier
from .boosting import AdaBoostNP
from .evaluation import auc_score
from .linear import LinearSVMNP, LogisticRegressionNP
from .mlp import MLPClassifierNP
from .neighbors import KNNClassifierNP
from .trees import DecisionTreeNP, ExtraTreesNP, RandomForestNP

__all__ = [
    "CLASSIFIERS",
    "make_classifier",
    "auc_score",
    "AdaBoostNP",
    "DecisionTreeNP",
    "ExtraTreesNP",
    "KNNClassifierNP",
    "LogisticRegressionNP",
    "MLPClassifierNP",
    "RandomForestNP",
    "LinearSVMNP",
    "GBDTClassifier",
]

CLASSIFIERS: dict[str, type] = {
    "AB": AdaBoostNP,
    "DT": DecisionTreeNP,
    "ET": ExtraTreesNP,
    "kNN": KNNClassifierNP,
    "LR": LogisticRegressionNP,
    "MLP": MLPClassifierNP,
    "RF": RandomForestNP,
    "SVM": LinearSVMNP,
    "XGB": GBDTClassifier,
}


def make_classifier(abbr: str, **overrides):
    """Fresh classifier instance by Table III abbreviation."""
    try:
        cls = CLASSIFIERS[abbr]
    except KeyError as exc:
        raise KeyError(f"unknown classifier {abbr!r}; known: {sorted(CLASSIFIERS)}") from exc
    return cls(**overrides)
