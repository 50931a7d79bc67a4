"""k-nearest-neighbour classifier (evaluation suite "kNN").

Brute-force Euclidean on standardized features, chunked so the distance
matrix never exceeds ~32 MB. sklearn default k=5.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

__all__ = ["KNNClassifierNP"]


@dataclass
class KNNClassifierNP:
    n_neighbors: int = 5

    _X: np.ndarray | None = field(default=None, repr=False)
    _y: np.ndarray | None = field(default=None, repr=False)
    _mu: np.ndarray | None = field(default=None, repr=False)
    _sd: np.ndarray | None = field(default=None, repr=False)

    def fit(self, X: np.ndarray, y: np.ndarray) -> "KNNClassifierNP":
        X = np.asarray(X, dtype=np.float64)
        self._mu = X.mean(axis=0)
        sd = X.std(axis=0)
        self._sd = np.where(sd > 0, sd, 1.0)
        self._X = (X - self._mu) / self._sd
        self._y = np.asarray(y, dtype=np.float64)
        return self

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        Q = (np.asarray(X, dtype=np.float64) - self._mu) / self._sd
        k = min(self.n_neighbors, len(self._X))
        chunk = max(1, int(32e6 / (8 * len(self._X))))
        probs = np.empty(len(Q))
        train_sq = (self._X**2).sum(axis=1)
        for start in range(0, len(Q), chunk):
            q = Q[start : start + chunk]
            d2 = train_sq[None, :] - 2.0 * q @ self._X.T + (q**2).sum(axis=1)[:, None]
            nn = np.argpartition(d2, k - 1, axis=1)[:, :k]
            probs[start : start + chunk] = self._y[nn].mean(axis=1)
        return np.column_stack([1 - probs, probs])

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.predict_proba(X)[:, 1] >= 0.5).astype(np.int64)
