"""miniml — from-scratch ML substrate standing in for scikit-learn.

The paper trains its models in scikit-learn (decision trees, random
forests, L1-regularized logistic regression, MLPs, k-means) and
featurizes with one-hot encoders and scalers. No sklearn wheel is
available offline, so this package implements the needed subset with
numpy. Everything is deterministic in an explicit ``seed``.
"""
from repro.miniml.tree import DecisionTree
from repro.miniml.forest import RandomForest
from repro.miniml.linear import LinearRegression, LogisticRegressionL1
from repro.miniml.mlp import MLPClassifier
from repro.miniml.kmeans import KMeans
from repro.miniml.featurize import OneHotEncoder, StandardScaler, TableFeaturizer
from repro.miniml.pipeline import Pipeline

__all__ = [
    "DecisionTree",
    "RandomForest",
    "LinearRegression",
    "LogisticRegressionL1",
    "MLPClassifier",
    "KMeans",
    "OneHotEncoder",
    "StandardScaler",
    "TableFeaturizer",
    "Pipeline",
]
