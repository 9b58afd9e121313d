"""Linear models: OLS linear regression and L1-regularized logistic
regression.

The L1 solver is proximal gradient descent (ISTA with a Lipschitz step
from the data Gram matrix), which produces *exactly* zero weights — the
property Fig. 2(a) of the paper exploits for model-projection pushdown.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


def sigmoid(z: np.ndarray) -> np.ndarray:
    """Numerically stable logistic function."""
    out = np.empty_like(z, dtype=np.float64)
    pos = z >= 0
    out[pos] = 1.0 / (1.0 + np.exp(-z[pos]))
    ez = np.exp(z[~pos])
    out[~pos] = ez / (1.0 + ez)
    return out


@dataclass(eq=False)
class LinearRegression:
    """Ordinary least squares via the normal equations (ridge-stabilized)."""

    l2: float = 1e-8
    coef_: np.ndarray = field(default_factory=lambda: np.zeros(0))
    intercept_: float = 0.0

    def fit(self, X: np.ndarray, y: np.ndarray) -> "LinearRegression":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.float64)
        Xb = np.hstack([X, np.ones((len(X), 1))])
        A = Xb.T @ Xb + self.l2 * np.eye(Xb.shape[1])
        w = np.linalg.solve(A, Xb.T @ y)
        self.coef_, self.intercept_ = w[:-1], float(w[-1])
        return self

    def predict(self, X: np.ndarray) -> np.ndarray:
        return np.asarray(X, dtype=np.float64) @ self.coef_ + self.intercept_


@dataclass(eq=False)
class LogisticRegressionL1:
    """Binary logistic regression with an L1 penalty (lasso-style).

    ``alpha`` is the L1 strength; larger alpha → more exactly-zero
    weights (``sparsity``). The intercept is never penalized.
    """

    alpha: float = 0.0
    max_iter: int = 400
    tol: float = 1e-7

    coef_: np.ndarray = field(default_factory=lambda: np.zeros(0))
    intercept_: float = 0.0

    def fit(self, X: np.ndarray, y: np.ndarray) -> "LogisticRegressionL1":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.float64)
        n, d = X.shape
        w = np.zeros(d)
        b = 0.0
        # Lipschitz constant of the logistic loss gradient: ||X||^2 / (4n)
        # (power-iteration estimate of the spectral norm).
        v = np.random.default_rng(0).standard_normal(d)
        for _ in range(20):
            v = X.T @ (X @ v)
            v /= np.linalg.norm(v) + 1e-12
        lip = float(v @ (X.T @ (X @ v))) / (4.0 * n) + 1e-9
        step = 1.0 / lip
        prev_obj = np.inf
        for _ in range(self.max_iter):
            z = X @ w + b
            p = sigmoid(z)
            g_w = X.T @ (p - y) / n
            g_b = float(np.mean(p - y))
            w_new = w - step * g_w
            # soft-threshold (proximal operator of alpha*||w||_1)
            thr = step * self.alpha
            w_new = np.sign(w_new) * np.maximum(np.abs(w_new) - thr, 0.0)
            b_new = b - step * g_b
            obj = self._objective(X, y, w_new, b_new)
            if abs(prev_obj - obj) < self.tol * max(1.0, abs(prev_obj)):
                w, b = w_new, b_new
                break
            w, b, prev_obj = w_new, b_new, obj
        self.coef_, self.intercept_ = w, float(b)
        return self

    def _objective(self, X, y, w, b) -> float:
        z = X @ w + b
        # log(1+exp(z)) - y*z, stably
        ll = np.logaddexp(0.0, z) - y * z
        return float(np.mean(ll) + self.alpha * np.sum(np.abs(w)))

    @property
    def sparsity(self) -> float:
        """Fraction of exactly-zero weights."""
        if len(self.coef_) == 0:
            return 0.0
        return float(np.mean(self.coef_ == 0.0))

    def decision_function(self, X: np.ndarray) -> np.ndarray:
        return np.asarray(X, dtype=np.float64) @ self.coef_ + self.intercept_

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        p1 = sigmoid(self.decision_function(X))
        return np.column_stack([1.0 - p1, p1])

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.decision_function(X) > 0).astype(np.int64)
