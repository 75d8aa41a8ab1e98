"""Minimal logistic regression (paper §III-D step 2 and §III-C footnote 2).

The paper fits a logistic-regression classifier (optimised with coordinate
descent) twice: once over the five aggregated evidence distances to obtain
the Eq. 3 weights, and once for the subject-attribute detector. sklearn is
not available offline, so this module implements the classifier directly:
full-batch gradient descent with L2 regularisation on standardised
features, which converges to the same optimum as coordinate descent for
this convex objective.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


def _sigmoid(z: np.ndarray) -> np.ndarray:
    return 1.0 / (1.0 + np.exp(-np.clip(z, -35.0, 35.0)))


@dataclass
class LogisticRegression:
    """L2-regularised logistic regression on standardised features."""

    lr: float = 0.5
    l2: float = 1e-3
    max_iter: int = 2000
    tol: float = 1e-8

    coef_: np.ndarray = field(default=None, repr=False)  # (d,)
    intercept_: float = 0.0
    mean_: np.ndarray = field(default=None, repr=False)
    scale_: np.ndarray = field(default=None, repr=False)

    def fit(self, X: np.ndarray, y: np.ndarray) -> "LogisticRegression":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.float64)
        if X.ndim != 2 or len(X) != len(y):
            raise ValueError("X must be (n, d) with len(y) == n")
        if not set(np.unique(y)) <= {0.0, 1.0}:
            raise ValueError("y must be binary 0/1")
        self.mean_ = X.mean(axis=0)
        self.scale_ = X.std(axis=0)
        self.scale_[self.scale_ == 0.0] = 1.0
        Xs = (X - self.mean_) / self.scale_
        n, d = Xs.shape
        w = np.zeros(d)
        b = 0.0
        prev_loss = np.inf
        for _ in range(self.max_iter):
            p = _sigmoid(Xs @ w + b)
            grad_w = Xs.T @ (p - y) / n + self.l2 * w
            grad_b = float(np.mean(p - y))
            w -= self.lr * grad_w
            b -= self.lr * grad_b
            loss = self._loss(Xs, y, w, b)
            if abs(prev_loss - loss) < self.tol:
                break
            prev_loss = loss
        self.coef_ = w
        self.intercept_ = b
        return self

    def _loss(self, Xs: np.ndarray, y: np.ndarray, w: np.ndarray, b: float) -> float:
        p = _sigmoid(Xs @ w + b)
        eps = 1e-12
        ce = -np.mean(y * np.log(p + eps) + (1 - y) * np.log(1 - p + eps))
        return float(ce + 0.5 * self.l2 * np.dot(w, w))

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        Xs = (np.asarray(X, dtype=np.float64) - self.mean_) / self.scale_
        return _sigmoid(Xs @ self.coef_ + self.intercept_)

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.predict_proba(X) >= 0.5).astype(np.int64)

    def accuracy(self, X: np.ndarray, y: np.ndarray) -> float:
        return float(np.mean(self.predict(X) == np.asarray(y)))
