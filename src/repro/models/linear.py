"""Linear classifiers of the evaluation suite: LR and linear-kernel SVM.

Both standardize inputs internally (as the sklearn pipelines the paper
uses would behave on these scales) and train full-batch with Adam — exact
optimisation details do not matter for the tables, only that the models
are *linear* in the supplied features, which is what makes generated
interaction features valuable to them (paper Table III shape).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from ..gbdt.boosting import sigmoid

__all__ = ["LogisticRegressionNP", "LinearSVMNP"]


def _adam(grad_fn, dim: int, lr: float, n_iter: int) -> np.ndarray:
    theta = np.zeros(dim)
    m = np.zeros(dim)
    v = np.zeros(dim)
    b1, b2, eps = 0.9, 0.999, 1e-8
    for t in range(1, n_iter + 1):
        g = grad_fn(theta)
        m = b1 * m + (1 - b1) * g
        v = b2 * v + (1 - b2) * g * g
        mh = m / (1 - b1**t)
        vh = v / (1 - b2**t)
        theta -= lr * mh / (np.sqrt(vh) + eps)
    return theta


@dataclass
class _Standardized:
    mu_: np.ndarray | None = field(default=None, repr=False)
    sd_: np.ndarray | None = field(default=None, repr=False)

    def _fit_scaler(self, X: np.ndarray) -> np.ndarray:
        self.mu_ = X.mean(axis=0)
        self.sd_ = X.std(axis=0)
        self.sd_ = np.where(self.sd_ > 0, self.sd_, 1.0)
        return (X - self.mu_) / self.sd_

    def _scale(self, X: np.ndarray) -> np.ndarray:
        return (np.asarray(X, dtype=np.float64) - self.mu_) / self.sd_


@dataclass
class LogisticRegressionNP(_Standardized):
    """L2-regularised logistic regression (full-batch Adam)."""

    C: float = 1.0
    n_iter: int = 300
    lr: float = 0.1

    w_: np.ndarray | None = field(default=None, repr=False)

    def fit(self, X: np.ndarray, y: np.ndarray) -> "LogisticRegressionNP":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.float64)
        Z = self._fit_scaler(X)
        Z1 = np.column_stack([Z, np.ones(len(Z))])
        lam = 1.0 / (self.C * len(y))

        def grad(theta):
            p = sigmoid(Z1 @ theta)
            g = Z1.T @ (p - y) / len(y)
            g[:-1] += lam * theta[:-1]  # don't regularise the intercept
            return g

        self.w_ = _adam(grad, Z1.shape[1], self.lr, self.n_iter)
        return self

    def decision_function(self, X: np.ndarray) -> np.ndarray:
        Z = self._scale(X)
        return Z @ self.w_[:-1] + self.w_[-1]

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        p = sigmoid(self.decision_function(X))
        return np.column_stack([1 - p, p])

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.decision_function(X) >= 0).astype(np.int64)


@dataclass
class LinearSVMNP(_Standardized):
    """L2-regularised linear SVM (hinge loss, full-batch Adam subgradient)."""

    C: float = 1.0
    n_iter: int = 300
    lr: float = 0.1

    w_: np.ndarray | None = field(default=None, repr=False)

    def fit(self, X: np.ndarray, y: np.ndarray) -> "LinearSVMNP":
        X = np.asarray(X, dtype=np.float64)
        s = 2.0 * np.asarray(y, dtype=np.float64) - 1.0  # ±1
        Z = self._fit_scaler(X)
        Z1 = np.column_stack([Z, np.ones(len(Z))])
        lam = 1.0 / (self.C * len(s))

        def grad(theta):
            margin = s * (Z1 @ theta)
            viol = margin < 1
            g = -(Z1[viol].T @ s[viol]) / len(s)
            g[:-1] += lam * theta[:-1]
            return g

        self.w_ = _adam(grad, Z1.shape[1], self.lr, self.n_iter)
        return self

    def decision_function(self, X: np.ndarray) -> np.ndarray:
        Z = self._scale(X)
        return Z @ self.w_[:-1] + self.w_[-1]

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        # Squash the margin so the harness can treat every model uniformly;
        # monotone in the decision function, so AUC is unchanged.
        p = sigmoid(self.decision_function(X))
        return np.column_stack([1 - p, p])

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.decision_function(X) >= 0).astype(np.int64)
