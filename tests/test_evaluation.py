"""Unit tests for the AUC metric."""
import numpy as np
import pytest

from repro.models.evaluation import auc_score


def test_perfect_ranking():
    assert auc_score([0, 0, 1, 1], [0.1, 0.2, 0.8, 0.9]) == 1.0


def test_inverted_ranking():
    assert auc_score([0, 0, 1, 1], [0.9, 0.8, 0.2, 0.1]) == 0.0


def test_random_is_half():
    rng = np.random.default_rng(0)
    y = rng.integers(0, 2, 20_000)
    s = rng.random(20_000)
    assert auc_score(y, s) == pytest.approx(0.5, abs=0.02)


def test_all_tied_scores_is_half():
    assert auc_score([0, 1, 0, 1], [0.5, 0.5, 0.5, 0.5]) == 0.5


def test_partial_ties_average_rank():
    # y: 1 pos with score tied to 1 neg, plus 1 clear neg
    # pairs: (pos,neg_tied)=0.5, (pos,neg_low)=1 -> auc 0.75
    assert auc_score([1, 0, 0], [0.5, 0.5, 0.1]) == 0.75


def test_monotone_transform_invariance():
    rng = np.random.default_rng(1)
    y = rng.integers(0, 2, 500)
    s = rng.normal(size=500)
    a1 = auc_score(y, s)
    a2 = auc_score(y, 1 / (1 + np.exp(-3 * s)))
    assert a1 == pytest.approx(a2)


def test_single_class_raises():
    with pytest.raises(ValueError):
        auc_score([1, 1, 1], [0.1, 0.2, 0.3])
    with pytest.raises(ValueError):
        auc_score([0, 0], [0.1, 0.2])


def test_matches_pairwise_definition():
    rng = np.random.default_rng(2)
    y = rng.integers(0, 2, 200)
    s = rng.normal(size=200)
    pos = s[y == 1]
    neg = s[y == 0]
    wins = (pos[:, None] > neg[None, :]).sum() + 0.5 * (pos[:, None] == neg[None, :]).sum()
    assert auc_score(y, s) == pytest.approx(wins / (len(pos) * len(neg)))
