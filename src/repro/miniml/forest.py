"""Random forests: bagged CART trees with feature subsampling."""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.miniml.tree import DecisionTree


@dataclass(eq=False)
class RandomForest:
    """Bagging ensemble of :class:`DecisionTree`.

    Feature subsampling is done per-tree (not per-split) so each member
    remains a plain CART tree — this keeps compiled (GEMM) forests a
    simple union of compiled trees.
    """

    n_trees: int = 10
    task: str = "classification"
    max_depth: int = 6
    min_samples_leaf: int = 8
    max_features: float | None = None  # fraction of features per tree; None = all
    seed: int = 0

    trees: list[DecisionTree] = field(default_factory=list)
    feature_subsets: list[np.ndarray] = field(default_factory=list)

    def fit(self, X: np.ndarray, y: np.ndarray) -> "RandomForest":
        X = np.asarray(X, dtype=np.float64)
        y = np.asarray(y)
        rng = np.random.default_rng(self.seed)
        n, f = X.shape
        n_sub = f if self.max_features is None else max(1, int(round(f * self.max_features)))
        if self.task == "classification":
            self._classes = np.unique(y)
        self.trees, self.feature_subsets = [], []
        for t in range(self.n_trees):
            rows = rng.integers(0, n, n)  # bootstrap
            cols = np.sort(rng.choice(f, n_sub, replace=False))
            tree = DecisionTree(
                task=self.task,
                max_depth=self.max_depth,
                min_samples_leaf=self.min_samples_leaf,
                seed=self.seed + t,
            )
            # train on the column subset; at predict time we re-project.
            tree.fit(X[np.ix_(rows, cols)], y[rows])
            self.trees.append(tree)
            self.feature_subsets.append(cols)
        return self

    @property
    def classes_(self) -> np.ndarray:
        return self._classes

    def _mean_value(self, X: np.ndarray) -> np.ndarray:
        X = np.asarray(X, dtype=np.float64)
        acc = None
        for tree, cols in zip(self.trees, self.feature_subsets):
            v = tree.predict_value(X[:, cols])
            if self.task == "classification" and len(tree.classes_) != len(self._classes):
                # a bootstrap sample may have missed a class: re-align columns
                full = np.zeros((len(X), len(self._classes)))
                idx = np.searchsorted(self._classes, tree.classes_)
                full[:, idx] = v
                v = full
            acc = v if acc is None else acc + v
        return acc / self.n_trees

    def predict_proba(self, X: np.ndarray) -> np.ndarray:
        if self.task != "classification":
            raise ValueError("predict_proba is classification-only")
        return self._mean_value(X)

    def predict(self, X: np.ndarray) -> np.ndarray:
        v = self._mean_value(X)
        if self.task == "classification":
            return self._classes[np.argmax(v, axis=1)]
        return v[:, 0]

    def predict_proba_rows(self, X: np.ndarray) -> np.ndarray:
        """Per-sample traversal (one tree walk per row per tree) — the
        classical-framework execution style; used as the interpreted
        baseline bracket in the NN-translation experiment."""
        X = np.asarray(X, dtype=np.float64)
        out = np.zeros((len(X), len(self._classes)))
        for r, x in enumerate(X):
            acc = np.zeros(len(self._classes))
            for tree, cols in zip(self.trees, self.feature_subsets):
                xi = x[cols]
                i = 0
                while tree.feature[i] != -1:
                    i = tree.left[i] if xi[tree.feature[i]] <= tree.threshold[i] else tree.right[i]
                v = tree.value[i]
                if len(tree.classes_) != len(self._classes):
                    full = np.zeros(len(self._classes))
                    full[np.searchsorted(self._classes, tree.classes_)] = v
                    v = full
                acc += v
            out[r] = acc / self.n_trees
        return out
