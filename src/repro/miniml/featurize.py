"""Featurizers: one-hot encoding, standard scaling, and the table-level
``TableFeaturizer`` that pipelines use.

``TableFeaturizer`` keeps an explicit *feature spec* — an ordered list of
``("num", col)`` / ``("cat", col, category)`` entries — so the optimizer
can reason about which model-feature corresponds to which input column.
That mapping is what makes model-projection pushdown (drop zero-weight
features → drop input columns → drop joins) and predicate-based
categorical pruning (equality filter → fold a one-hot block into the
intercept) expressible as IR rewrites.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd


@dataclass
class OneHotEncoder:
    """Dense one-hot for a single column with a closed category set."""

    categories_: list = field(default_factory=list)

    def fit(self, values) -> "OneHotEncoder":
        self.categories_ = sorted(pd.unique(pd.Series(values)).tolist())
        return self

    def transform(self, values) -> np.ndarray:
        codes = self.codes(values)
        out = np.zeros((len(codes), len(self.categories_)))
        valid = codes >= 0
        out[np.nonzero(valid)[0], codes[valid]] = 1.0
        return out

    def codes(self, values) -> np.ndarray:
        """Integer codes (−1 for unseen categories → all-zero row)."""
        cat = pd.Categorical(pd.Series(values), categories=self.categories_)
        return np.asarray(cat.codes, dtype=np.int64)


@dataclass(eq=False)
class StandardScaler:
    mean_: np.ndarray = field(default_factory=lambda: np.zeros(0))
    scale_: np.ndarray = field(default_factory=lambda: np.ones(0))

    def fit(self, X: np.ndarray) -> "StandardScaler":
        X = np.asarray(X, dtype=np.float64)
        self.mean_ = X.mean(axis=0)
        std = X.std(axis=0)
        self.scale_ = np.where(std > 1e-12, std, 1.0)
        return self

    def transform(self, X: np.ndarray) -> np.ndarray:
        return (np.asarray(X, dtype=np.float64) - self.mean_) / self.scale_


@dataclass(eq=False)
class TableFeaturizer:
    """DataFrame → dense feature matrix with named features.

    Numeric columns are optionally standardized; categorical columns are
    one-hot encoded with feature names ``col=value``. The feature order
    is: numeric columns first (input order), then one-hot blocks.
    """

    numeric_cols: list[str] = field(default_factory=list)
    categorical_cols: list[str] = field(default_factory=list)
    scale: bool = True

    scaler: StandardScaler | None = None
    encoders: dict[str, OneHotEncoder] = field(default_factory=dict)

    def fit(self, df: pd.DataFrame) -> "TableFeaturizer":
        if self.numeric_cols and self.scale:
            self.scaler = StandardScaler().fit(df[self.numeric_cols].to_numpy())
        self.encoders = {
            c: OneHotEncoder().fit(df[c]) for c in self.categorical_cols
        }
        return self

    # ------------------------------------------------------------ info
    @property
    def feature_specs(self) -> list[tuple]:
        specs: list[tuple] = [("num", c) for c in self.numeric_cols]
        for c in self.categorical_cols:
            specs.extend(("cat", c, v) for v in self.encoders[c].categories_)
        return specs

    @property
    def feature_names(self) -> list[str]:
        return [
            s[1] if s[0] == "num" else f"{s[1]}={s[2]}" for s in self.feature_specs
        ]

    @property
    def n_features(self) -> int:
        return len(self.numeric_cols) + sum(
            len(self.encoders[c].categories_) for c in self.categorical_cols
        )

    @property
    def input_cols(self) -> list[str]:
        return [*self.numeric_cols, *self.categorical_cols]

    # ------------------------------------------------------- transform
    def transform(self, df: pd.DataFrame) -> np.ndarray:
        """Single-allocation dense featurization: numeric block and
        one-hot blocks are written straight into the output matrix (no
        hstack copy — inference cost tracks feature width, which is what
        the projection/clustering optimizations shrink)."""
        n = len(df)
        out = np.zeros((n, self.n_features))
        col = 0
        if self.numeric_cols:
            num = df[self.numeric_cols].to_numpy(dtype=np.float64)
            k = len(self.numeric_cols)
            out[:, :k] = self.scaler.transform(num) if self.scaler else num
            col = k
        for c in self.categorical_cols:
            enc = self.encoders[c]
            codes = enc.codes(df[c])
            valid = codes >= 0
            out[np.nonzero(valid)[0], col + codes[valid]] = 1.0
            col += len(enc.categories_)
        return out

    def transform_codes(self, df: pd.DataFrame) -> dict[str, np.ndarray]:
        """Inputs for the NN-graph form of this featurizer: the *raw*
        numeric block (the graph owns scaling, see
        ``onnxlite.convert.featurizer_nodes``) plus one int-code vector
        per categorical column."""
        out: dict[str, np.ndarray] = {}
        if self.numeric_cols:
            out["num"] = df[self.numeric_cols].to_numpy(dtype=np.float64)
        for c in self.categorical_cols:
            out[f"cat_{c}"] = self.encoders[c].codes(df[c])
        return out

    # ------------------------------------------- optimizer-facing edits
    def drop_features(self, names: set[str]) -> tuple["TableFeaturizer", np.ndarray]:
        """Remove features by name. Returns (new featurizer, kept index
        array into the *old* feature order) so callers can slice model
        weights to match. Dropping every category of a categorical
        column (or a numeric column) removes the input column itself."""
        keep_idx = [i for i, n in enumerate(self.feature_names) if n not in names]
        specs = self.feature_specs
        kept = [specs[i] for i in keep_idx]

        new = TableFeaturizer(scale=self.scale)
        new.numeric_cols = [s[1] for s in kept if s[0] == "num"]
        if new.numeric_cols and self.scaler is not None:
            sub = [self.numeric_cols.index(c) for c in new.numeric_cols]
            sc = StandardScaler()
            sc.mean_ = self.scaler.mean_[sub]
            sc.scale_ = self.scaler.scale_[sub]
            new.scaler = sc
        for c in self.categorical_cols:
            cats = [s[2] for s in kept if s[0] == "cat" and s[1] == c]
            if cats:
                new.categorical_cols.append(c)
                enc = OneHotEncoder()
                enc.categories_ = cats
                new.encoders[c] = enc
        return new, np.array(keep_idx, dtype=np.int64)

    def bind_categorical(
        self, col: str, value
    ) -> tuple["TableFeaturizer", dict[str, float], np.ndarray]:
        """Apply an equality predicate ``col == value``: the whole
        one-hot block becomes constant, so it is removed from the
        featurizer. Returns (new featurizer, {feature name: constant
        value} for the removed block, kept index array)."""
        if col not in self.categorical_cols:
            raise KeyError(col)
        consts = {
            f"{col}={v}": (1.0 if v == value else 0.0)
            for v in self.encoders[col].categories_
        }
        new, keep_idx = self.drop_features(set(consts))
        return new, consts, keep_idx
