"""Multi-layer perceptron (evaluation suite "MLP").

One ReLU hidden layer trained with minibatch Adam on log-loss over
standardized inputs — a scaled-down ``sklearn.neural_network.MLPClassifier``
(32 units vs 100, 60 epochs) sized for the Table III sweep.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from ..gbdt.boosting import sigmoid

__all__ = ["MLPClassifierNP"]


@dataclass
class MLPClassifierNP:
    hidden: int = 32
    epochs: int = 60
    batch_size: int = 128
    lr: float = 1e-3
    random_state: int = 0

    _params: dict | None = field(default=None, repr=False)
    _mu: np.ndarray | None = field(default=None, repr=False)
    _sd: np.ndarray | None = field(default=None, repr=False)

    def fit(self, X: np.ndarray, y: np.ndarray) -> "MLPClassifierNP":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.float64)
        self._mu = X.mean(axis=0)
        sd = X.std(axis=0)
        self._sd = np.where(sd > 0, sd, 1.0)
        Z = (X - self._mu) / self._sd
        rng = np.random.default_rng(self.random_state)
        n, d = Z.shape
        h = self.hidden
        W1 = rng.normal(0, np.sqrt(2.0 / d), (d, h))
        b1 = np.zeros(h)
        W2 = rng.normal(0, np.sqrt(2.0 / h), h)
        b2 = 0.0
        params = [W1, b1, W2, b2]
        m_t = [np.zeros_like(p) if isinstance(p, np.ndarray) else 0.0 for p in params]
        v_t = [np.zeros_like(p) if isinstance(p, np.ndarray) else 0.0 for p in params]
        beta1, beta2, eps = 0.9, 0.999, 1e-8
        step = 0
        for _e in range(self.epochs):
            order = rng.permutation(n)
            for start in range(0, n, self.batch_size):
                idx = order[start : start + self.batch_size]
                zb, yb = Z[idx], y[idx]
                a1 = zb @ params[0] + params[1]
                r1 = np.maximum(a1, 0.0)
                logit = r1 @ params[2] + params[3]
                p = sigmoid(logit)
                dlogit = (p - yb) / len(yb)
                gW2 = r1.T @ dlogit
                gb2 = dlogit.sum()
                dr1 = np.outer(dlogit, params[2]) * (a1 > 0)
                gW1 = zb.T @ dr1
                gb1 = dr1.sum(axis=0)
                grads = [gW1, gb1, gW2, gb2]
                step += 1
                for i in range(4):
                    m_t[i] = beta1 * m_t[i] + (1 - beta1) * grads[i]
                    v_t[i] = beta2 * v_t[i] + (1 - beta2) * (
                        grads[i] * grads[i]
                        if isinstance(grads[i], np.ndarray)
                        else grads[i] ** 2
                    )
                    mh = m_t[i] / (1 - beta1**step)
                    vh = v_t[i] / (1 - beta2**step)
                    params[i] = params[i] - self.lr * mh / (np.sqrt(vh) + eps)
        self._params = {"W1": params[0], "b1": params[1], "W2": params[2], "b2": params[3]}
        return self

    def decision_function(self, X: np.ndarray) -> np.ndarray:
        Z = (np.asarray(X, dtype=np.float64) - self._mu) / self._sd
        p = self._params
        r1 = np.maximum(Z @ p["W1"] + p["b1"], 0.0)
        return r1 @ p["W2"] + p["b2"]

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        p = sigmoid(self.decision_function(X))
        return np.column_stack([1 - p, p])

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.decision_function(X) >= 0).astype(np.int64)
