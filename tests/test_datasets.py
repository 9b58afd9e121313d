"""Tests for the synthetic dataset generators."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets import flights, hospital
from repro.miniml import DecisionTree, LogisticRegressionL1, Pipeline, TableFeaturizer
from repro.miniml.metrics import auc


class TestHospital:
    def test_tables_shapes_and_keys(self):
        t = hospital.tables(500, seed=0)
        assert set(t) == {"patient_info", "blood_tests", "prenatal_tests"}
        for df in t.values():
            assert len(df) == 500
            assert df["pid"].is_unique

    def test_pregnant_only_female_under_50(self):
        t = hospital.tables(3000, seed=1)
        p = t["patient_info"]
        preg = p[p["pregnant"] == 1]
        assert (preg["gender"] == 1).all()
        assert (preg["age"] <= 50).all()

    def test_prenatal_consistency(self):
        t = hospital.tables(2000, seed=2)
        joined = t["patient_info"].merge(t["prenatal_tests"], on="pid")
        not_preg = joined[joined["pregnant"] == 0]
        assert (not_preg["trimester"] == 0).all()
        assert (not_preg["fetal_hr"] == 0).all()
        preg = joined[joined["pregnant"] == 1]
        assert preg["trimester"].between(1, 3).all()

    def test_joined_frame_has_label(self):
        df = hospital.joined_frame(300, seed=3)
        assert "los" in df.columns
        assert (df["los"] >= 0).all()

    def test_deterministic(self):
        a = hospital.joined_frame(200, seed=4)
        b = hospital.joined_frame(200, seed=4)
        pd.testing.assert_frame_equal(a, b)

    def test_pregnancy_signal_dominates(self):
        """The planted shape: a shallow tree's root split must partition
        (almost exactly) by pregnancy — the running-example structure.
        (The chosen feature may be a clinical proxy like fetal_hr; what
        matters for the paper's pruning story is the partition.)"""
        df = hospital.joined_frame(4000, seed=5)
        X = df[hospital.FEATURES].to_numpy(float)
        t = DecisionTree(task="regression", max_depth=3, min_samples_leaf=20).fit(
            X, df["los"].to_numpy()
        )
        go_left = X[:, t.feature[0]] <= t.threshold[0]
        pregnant = df["pregnant"].to_numpy() == 1
        agreement = max(
            np.mean(go_left == pregnant), np.mean(go_left == ~pregnant)
        )
        assert agreement > 0.99

    def test_spark_tables(self, spark):
        t = hospital.spark_tables(spark, 100, seed=0)
        assert t["patient_info"].count() == 100


class TestFlights:
    def test_schema_and_determinism(self):
        a = flights.frame(400, seed=0)
        b = flights.frame(400, seed=0)
        pd.testing.assert_frame_equal(a, b)
        assert set(flights.NUMERIC + flights.CATEGORICAL) <= set(a.columns)

    def test_label_signal_learnable(self):
        df = flights.frame(20_000, seed=1)
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=flights.NUMERIC, categorical_cols=flights.CATEGORICAL),
            LogisticRegressionL1(alpha=0.0, max_iter=200),
        ).fit(df, df["delayed"].to_numpy())
        test = flights.frame(5_000, seed=2)
        assert auc(test["delayed"].to_numpy(), pipe.predict_proba(test)[:, 1]) > 0.7

    def test_congested_dests_matter(self):
        df = flights.frame(50_000, seed=3)
        p_congested = df[df["dest"] == "A01"]["delayed"].mean()
        p_other = df[df["dest"] == "A02"]["delayed"].mean()
        assert p_congested > p_other + 0.1

    def test_dest_skew(self):
        df = flights.frame(50_000, seed=4, dest_skew=1.2)
        counts = df["dest"].value_counts()
        assert counts.iloc[0] > 10 * counts.iloc[-1]

    def test_n_airports_widens_vocab(self):
        df = flights.frame(20_000, seed=5, n_airports=300)
        assert df["dest"].nunique() > 150

    def test_spark_frame(self, spark):
        assert flights.spark_frame(spark, 100, seed=0).count() == 100
