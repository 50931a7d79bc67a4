"""Unit tests for the feature-stability metric (Table VI)."""
from collections import Counter

import numpy as np
import pytest

from repro.experiments.datasets import BENCHMARK_DATASETS, make_dataset
from repro.experiments.stability import feature_stability, ideal_reference, jsd


def test_jsd_zero_for_identical():
    p = np.array([3.0, 2.0, 5.0])
    assert jsd(p, p) == pytest.approx(0.0)


def test_jsd_symmetric():
    p = np.array([1.0, 2.0, 3.0, 0.0])
    q = np.array([3.0, 1.0, 0.0, 2.0])
    assert jsd(p, q) == pytest.approx(jsd(q, p))


def test_jsd_bounded_by_ln2():
    p = np.array([1.0, 0.0])
    q = np.array([0.0, 1.0])
    assert jsd(p, q) == pytest.approx(np.log(2))


def test_jsd_handles_zeros():
    p = np.array([1.0, 0.0, 1.0])
    q = np.array([1.0, 1.0, 0.0])
    v = jsd(p, q)
    assert 0 < v < np.log(2) + 1e-12


def test_ideal_reference_perfectly_stable():
    """Same 2M features every run → actual == ideal → JSD 0."""
    counts = Counter({f"f{i}": 10 for i in range(8)})
    actual, ideal = ideal_reference(counts, n_features=8, T=10)
    assert jsd(actual, ideal) == pytest.approx(0.0)


def test_ideal_reference_unstable_features_score_higher():
    stable = Counter({f"f{i}": 10 for i in range(8)})
    unstable = Counter({f"g{i}": 1 for i in range(80)})
    ja = jsd(*ideal_reference(stable, 8, 10))
    jb = jsd(*ideal_reference(unstable, 8, 10))
    assert jb > ja


def test_feature_stability_orders_safe_before_rand():
    """SAFE's mining is data-driven → more stable than random pairing.

    Uses magic (dim 10 → 45 candidate pairs vs γ=20, so random pairing
    genuinely varies across repeats); T=6 repeats is enough to separate a
    data-driven miner from uniform sampling. banknote (dim 4) would be
    degenerate: γ covers every pair, making all methods identical.
    """
    spec = [s for s in BENCHMARK_DATASETS if s.name == "magic"][0]
    train, _va, _te = make_dataset(spec)
    j_safe = feature_stability("SAFE", train, T=6)
    j_rand = feature_stability("RAND", train, T=6)
    assert 0 <= j_safe <= np.log(2) + 1e-9
    assert 0 <= j_rand <= np.log(2) + 1e-9
    assert j_safe < j_rand


def test_feature_stability_deterministic():
    spec = BENCHMARK_DATASETS[1]
    train, _va, _te = make_dataset(spec)
    assert feature_stability("IMP", train, T=3) == feature_stability("IMP", train, T=3)
