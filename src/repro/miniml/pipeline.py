"""Model pipeline = featurizer + estimator, the unit the paper stores
in the DB (an MLflow-style "model pipeline")."""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.miniml.featurize import TableFeaturizer


@dataclass
class Pipeline:
    """Featurize a DataFrame then apply the estimator.

    ``model`` is any miniml estimator with ``predict`` (and optionally
    ``predict_proba`` / ``decision_function``) over a dense matrix.
    """

    featurizer: TableFeaturizer
    model: object

    def fit(self, df: pd.DataFrame, y: np.ndarray) -> "Pipeline":
        self.featurizer.fit(df)
        self.model.fit(self.featurizer.transform(df), y)
        return self

    @property
    def input_cols(self) -> list[str]:
        return self.featurizer.input_cols

    def predict(self, df: pd.DataFrame) -> np.ndarray:
        return self.model.predict(self.featurizer.transform(df))

    def predict_proba(self, df: pd.DataFrame) -> np.ndarray:
        return self.model.predict_proba(self.featurizer.transform(df))

    def decision_function(self, df: pd.DataFrame) -> np.ndarray:
        return self.model.decision_function(self.featurizer.transform(df))

    def predict_row(self, row: dict) -> object:
        """Per-tuple prediction (featurize a 1-row frame, traverse once).
        This is the deliberately naive baseline for the batch-vs-tuple
        experiment (T7)."""
        df = pd.DataFrame([row])
        x = self.featurizer.transform(df)
        if hasattr(self.model, "predict_row"):
            return self.model.predict_row(x[0])
        return self.model.predict(x)[0]
