"""Feature-stability experiment (paper §V-A5, Table VI).

Repeat an AFE method T times (each on an 80% bootstrap of the training
rows — repeated runs in the paper differ through the method's own
stochasticity; subsampling realises that for every method including the
deterministic ones), count how often each output feature appears, and
score the count distribution's Jensen–Shannon divergence from the ideal
distribution (the same 2·M features all T times). Lower = more stable.
"""
from __future__ import annotations

from collections import Counter

import numpy as np
import pandas as pd

from .datasets import LABEL_COL
from .runner import fit_method

__all__ = ["jsd", "ideal_reference", "feature_stability"]


def _kld(p: np.ndarray, q: np.ndarray) -> float:
    """KL divergence (nats); 0·ln(0/·) := 0. ``q`` must be >0 where p>0."""
    mask = p > 0
    return float(np.sum(p[mask] * np.log(p[mask] / q[mask])))


def jsd(p: np.ndarray, q: np.ndarray) -> float:
    """Jensen–Shannon divergence (Eq. 14/15); bounded by ln 2 ≈ 0.6931."""
    p = np.asarray(p, dtype=np.float64)
    q = np.asarray(q, dtype=np.float64)
    p = p / p.sum()
    q = q / q.sum()
    r = (p + q) / 2.0
    return 0.5 * (_kld(p, r) + _kld(q, r))


def ideal_reference(counts: Counter, n_features: int, T: int) -> tuple[np.ndarray, np.ndarray]:
    """(actual, ideal) count vectors over the union support.

    Ideal distribution D̂is: the ``n_features`` most frequent features each
    appearing all T times (paper §V-A5); all other observed features 0.
    """
    items = counts.most_common()
    support = [name for name, _c in items]
    actual = np.array([c for _n, c in items], dtype=np.float64)
    ideal = np.zeros(len(support))
    ideal[: min(n_features, len(support))] = T
    return actual, ideal


def feature_stability(
    method: str,
    train: pd.DataFrame,
    label_col: str = LABEL_COL,
    valid: pd.DataFrame | None = None,
    T: int = 20,
    frac: float = 0.8,
    base_seed: int = 0,
) -> float:
    """JSD stability score of one method over T bootstrap repeats."""
    m = len([c for c in train.columns if c != label_col])
    counts: Counter = Counter()
    for t in range(T):
        rng = np.random.default_rng(base_seed + t)
        idx = rng.choice(len(train), size=int(frac * len(train)), replace=False)
        sub = train.iloc[idx].reset_index(drop=True)
        res = fit_method(method, sub, label_col, valid, seed=base_seed + t)
        counts.update(res.plan.output_columns)
    actual, ideal = ideal_reference(counts, 2 * m, T)
    return jsd(actual, ideal)
