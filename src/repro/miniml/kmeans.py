"""Lloyd's k-means with k-means++ initialization.

Used by the paper's *model clustering* optimization (§4.1 / Fig. 2b):
cluster historical data offline, then precompile a simplified model per
cluster (dropping features that are constant within the cluster).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass(eq=False)
class KMeans:
    k: int = 8
    max_iter: int = 50
    tol: float = 1e-6
    seed: int = 0

    centers_: np.ndarray = field(default_factory=lambda: np.zeros((0, 0)))
    inertia_: float = 0.0

    def _init_centers(self, X: np.ndarray, rng: np.random.Generator) -> np.ndarray:
        n = len(X)
        centers = [X[rng.integers(n)]]
        for _ in range(1, self.k):
            d2 = np.min(
                ((X[:, None, :] - np.array(centers)[None, :, :]) ** 2).sum(-1), axis=1
            )
            total = d2.sum()
            if total <= 0:
                centers.append(X[rng.integers(n)])
                continue
            centers.append(X[rng.choice(n, p=d2 / total)])
        return np.array(centers)

    def fit(self, X: np.ndarray) -> "KMeans":
        X = np.asarray(X, dtype=np.float64)
        rng = np.random.default_rng(self.seed)
        if self.k >= len(X):
            self.centers_ = X.copy()
            self.k = len(X)
            self.inertia_ = 0.0
            return self
        centers = self._init_centers(X, rng)
        prev = np.inf
        for _ in range(self.max_iter):
            lab = self._assign(X, centers)
            for c in range(self.k):
                mask = lab == c
                if mask.any():
                    centers[c] = X[mask].mean(axis=0)
            inertia = float(((X - centers[lab]) ** 2).sum())
            if prev - inertia < self.tol * max(1.0, prev):
                break
            prev = inertia
        self.centers_ = centers
        self.inertia_ = inertia
        return self

    @staticmethod
    def _assign(X: np.ndarray, centers: np.ndarray) -> np.ndarray:
        # ||x-c||^2 = ||x||^2 - 2 x.c + ||c||^2 ; ||x||^2 constant per row
        d = -2.0 * (X @ centers.T) + (centers**2).sum(axis=1)[None, :]
        return np.argmin(d, axis=1)

    def predict(self, X: np.ndarray) -> np.ndarray:
        return self._assign(np.asarray(X, dtype=np.float64), self.centers_)
