"""Unit tests for the three-stage feature selection (§IV-C)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.engine import LocalEngine
from repro.core.selection import select_features


@pytest.fixture()
def engine():
    rng = np.random.default_rng(0)
    n = 3000
    y = rng.integers(0, 2, n)
    pdf = pd.DataFrame(
        {
            "strong": y + rng.normal(0, 0.6, n),
            "noise": rng.normal(size=n),
            "label": y,
        }
    )
    # near-duplicate of strong with slightly weaker signal
    pdf["dup"] = pdf["strong"] + rng.normal(0, 0.05, n)
    pdf["medium"] = y + rng.normal(0, 2.0, n)
    return LocalEngine(pdf, "label")


def test_iv_filter_drops_noise(engine):
    rep = select_features(engine, ["strong", "noise", "medium", "dup"])
    assert "noise" not in rep["informative"]
    assert "strong" in rep["informative"]


def test_redundancy_filter_drops_duplicate(engine):
    rep = select_features(engine, ["strong", "dup", "medium"])
    kept = rep["nonredundant"]
    assert ("strong" in kept) ^ ("dup" in kept)  # exactly one survives
    assert "medium" in kept


def test_higher_iv_member_survives(engine):
    rep = select_features(engine, ["strong", "dup"])
    iv = rep["iv"]
    winner = "strong" if iv["strong"] >= iv["dup"] else "dup"
    assert rep["nonredundant"] == [winner]


def test_top_k_cap(engine):
    rep = select_features(engine, ["strong", "medium", "dup"], top_k=1)
    assert len(rep["selected"]) == 1


def test_selected_ranked_by_importance(engine):
    rep = select_features(engine, ["strong", "medium"])
    imp = rep["importance"]
    assert rep["selected"][0] == max(imp, key=imp.get)


def test_degenerate_all_uninformative():
    rng = np.random.default_rng(1)
    pdf = pd.DataFrame(
        {
            "n1": rng.normal(size=500),
            "n2": rng.normal(size=500),
            "label": rng.integers(0, 2, 500),
        }
    )
    eng = LocalEngine(pdf, "label")
    rep = select_features(eng, ["n1", "n2"], top_k=2)
    assert rep["selected"]  # guard keeps the set non-empty


def test_alpha_zero_keeps_everything(engine):
    rep = select_features(engine, ["strong", "noise", "medium"], alpha=-1.0, theta=1.1)
    assert set(rep["informative"]) == {"strong", "noise", "medium"}
    assert set(rep["nonredundant"]) == {"strong", "noise", "medium"}


def test_report_keys(engine):
    rep = select_features(engine, ["strong", "medium"])
    assert set(rep) == {
        "candidates",
        "iv",
        "informative",
        "nonredundant",
        "importance",
        "selected",
    }
