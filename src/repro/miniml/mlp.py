"""A small multi-layer perceptron (binary classifier), trained with
mini-batch SGD. Inference is plain GEMM+ReLU+sigmoid — the shape the
paper's NN-translation path targets (Fig. 3 uses an MLP pipeline)."""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.miniml.linear import sigmoid


@dataclass(eq=False)
class MLPClassifier:
    hidden: tuple[int, ...] = (32, 16)
    epochs: int = 20
    lr: float = 0.05
    batch_size: int = 256
    seed: int = 0

    weights: list[np.ndarray] = field(default_factory=list)
    biases: list[np.ndarray] = field(default_factory=list)

    def _init(self, d_in: int) -> None:
        rng = np.random.default_rng(self.seed)
        dims = [d_in, *self.hidden, 1]
        self.weights = [
            rng.standard_normal((a, b)) * np.sqrt(2.0 / a) for a, b in zip(dims, dims[1:])
        ]
        self.biases = [np.zeros(b) for b in dims[1:]]

    def fit(self, X: np.ndarray, y: np.ndarray) -> "MLPClassifier":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y, dtype=np.float64).reshape(-1, 1)
        self._init(X.shape[1])
        rng = np.random.default_rng(self.seed + 1)
        n = len(X)
        for _ in range(self.epochs):
            order = rng.permutation(n)
            for s in range(0, n, self.batch_size):
                idx = order[s : s + self.batch_size]
                self._sgd_step(X[idx], y[idx])
        return self

    def _sgd_step(self, Xb: np.ndarray, yb: np.ndarray) -> None:
        acts = [Xb]
        # forward
        for i, (W, b) in enumerate(zip(self.weights, self.biases)):
            z = acts[-1] @ W + b
            acts.append(np.maximum(z, 0.0) if i < len(self.weights) - 1 else z)
        p = sigmoid(acts[-1])
        # backward (binary cross-entropy)
        delta = (p - yb) / len(Xb)
        for i in range(len(self.weights) - 1, -1, -1):
            gW = acts[i].T @ delta
            gb = delta.sum(axis=0)
            if i > 0:
                delta = (delta @ self.weights[i].T) * (acts[i] > 0)
            self.weights[i] -= self.lr * gW
            self.biases[i] -= self.lr * gb

    def decision_function(self, X: np.ndarray) -> np.ndarray:
        h = np.asarray(X, dtype=np.float64)
        for i, (W, b) in enumerate(zip(self.weights, self.biases)):
            h = h @ W + b
            if i < len(self.weights) - 1:
                h = np.maximum(h, 0.0)
        return h[:, 0]

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        p1 = sigmoid(self.decision_function(X))
        return np.column_stack([1.0 - p1, p1])

    def predict(self, X: np.ndarray) -> np.ndarray:
        return (self.decision_function(X) > 0).astype(np.int64)
