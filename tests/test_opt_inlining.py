"""Model inlining: generated SQL CASE/arithmetic expressions must equal
the python model's predictions — verified through both DuckDB (oracle)
and Spark."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets import hospital
from repro.ir import Catalog, MLPredict, Project, Scan, walk
from repro.miniml import (
    DecisionTree,
    LinearRegression,
    LogisticRegressionL1,
    Pipeline,
    RandomForest,
    TableFeaturizer,
)
from repro.optimizer.inlining import (
    ModelInlining,
    forest_to_sql,
    inline_pipeline_sql,
    linear_to_sql,
    tree_to_sql,
)
from repro.runtime.codegen import to_dataframe


def _duck_eval(sql_expr: str, pdf: pd.DataFrame) -> np.ndarray:
    import duckdb

    con = duckdb.connect()
    con.register("t", pdf)
    out = con.execute(f"SELECT {sql_expr} AS v FROM t").fetchdf()["v"].to_numpy()
    con.close()
    return out


@pytest.fixture(scope="module")
def hosp():
    return hospital.joined_frame(3000, seed=7)


class TestTreeToSql:
    def test_regression_tree_matches_duckdb(self, hosp):
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=hospital.FEATURES, scale=False),
            DecisionTree(task="regression", max_depth=5, min_samples_leaf=10),
        ).fit(hosp[hospital.FEATURES], hosp["los"].to_numpy())
        sql = tree_to_sql(pipe.model, pipe.featurizer, kind="label")
        got = _duck_eval(sql, hosp)
        np.testing.assert_allclose(got, pipe.predict(hosp))

    def test_classification_tree_label(self, hosp):
        y = (hosp["los"] > 7).astype(int).to_numpy()
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=hospital.FEATURES, scale=False),
            DecisionTree(max_depth=4, min_samples_leaf=10),
        ).fit(hosp[hospital.FEATURES], y)
        sql = tree_to_sql(pipe.model, pipe.featurizer, kind="label")
        np.testing.assert_allclose(_duck_eval(sql, hosp), pipe.predict(hosp))

    def test_classification_tree_proba(self, hosp):
        y = (hosp["los"] > 7).astype(int).to_numpy()
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=hospital.FEATURES, scale=False),
            DecisionTree(max_depth=4, min_samples_leaf=10),
        ).fit(hosp[hospital.FEATURES], y)
        sql = tree_to_sql(pipe.model, pipe.featurizer, kind="proba")
        np.testing.assert_allclose(
            _duck_eval(sql, hosp), pipe.predict_proba(hosp)[:, 1]
        )

    def test_scaled_features_inverted_through_scaler(self, hosp):
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=hospital.FEATURES, scale=True),
            DecisionTree(task="regression", max_depth=4, min_samples_leaf=10),
        ).fit(hosp[hospital.FEATURES], hosp["los"].to_numpy())
        sql = tree_to_sql(pipe.model, pipe.featurizer, kind="label")
        np.testing.assert_allclose(_duck_eval(sql, hosp), pipe.predict(hosp))

    def test_categorical_split_raises(self, hosp):
        df = hosp.assign(city=np.where(hosp["age"] > 50, "NYC", "SEA"))
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=["age"], categorical_cols=["city"]),
            DecisionTree(max_depth=3, min_samples_leaf=5),
        ).fit(df, (df["los"] > 5).astype(int).to_numpy())
        tree = pipe.model
        if any(
            pipe.featurizer.feature_specs[int(f)][0] == "cat"
            for f in tree.feature
            if f != -1
        ):
            with pytest.raises(ValueError, match="categorical"):
                tree_to_sql(tree, pipe.featurizer)


class TestLinearToSql:
    def test_logistic_score_and_proba(self, hosp):
        y = (hosp["los"] > 7).astype(int).to_numpy()
        df = hosp.assign(ward=np.random.default_rng(0).choice(["a", "b", "c"], len(hosp)))
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=["age", "bp"], categorical_cols=["ward"]),
            LogisticRegressionL1(alpha=0.001, max_iter=200),
        ).fit(df, y)
        sql_s = linear_to_sql(pipe.model, pipe.featurizer, kind="score")
        np.testing.assert_allclose(
            _duck_eval(sql_s, df), pipe.decision_function(df), atol=1e-9
        )
        sql_p = linear_to_sql(pipe.model, pipe.featurizer, kind="proba")
        np.testing.assert_allclose(
            _duck_eval(sql_p, df), pipe.predict_proba(df)[:, 1], atol=1e-9
        )

    def test_linear_regression(self, hosp):
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=["age", "bp"], scale=False),
            LinearRegression(),
        ).fit(hosp, hosp["los"].to_numpy())
        sql = inline_pipeline_sql(pipe, "label")
        np.testing.assert_allclose(_duck_eval(sql, hosp), pipe.predict(hosp), atol=1e-9)

    def test_zero_weights_skipped_in_sql(self):
        rng = np.random.default_rng(0)
        df = pd.DataFrame({"a": rng.random(500), "b": rng.random(500)})
        y = (df["a"] > 0.5).astype(int).to_numpy()
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=["a", "b"]), LogisticRegressionL1(alpha=0.08)
        ).fit(df, y)
        if pipe.model.coef_[1] == 0.0:
            sql = linear_to_sql(pipe.model, pipe.featurizer)
            assert " b" not in sql


class TestForestToSql:
    def test_binary_forest_matches(self, hosp):
        y = (hosp["los"] > 7).astype(int).to_numpy()
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=hospital.FEATURES, scale=False),
            RandomForest(n_trees=3, max_depth=3, seed=0),
        ).fit(hosp[hospital.FEATURES], y)
        sql = forest_to_sql(pipe.model, pipe.featurizer, kind="proba")
        np.testing.assert_allclose(
            _duck_eval(sql, hosp), pipe.predict_proba(hosp)[:, 1], atol=1e-12
        )

    def test_regression_forest_matches(self, hosp):
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=hospital.FEATURES, scale=False),
            RandomForest(n_trees=3, task="regression", max_depth=3, seed=0),
        ).fit(hosp[hospital.FEATURES], hosp["los"].to_numpy())
        sql = forest_to_sql(pipe.model, pipe.featurizer)
        np.testing.assert_allclose(_duck_eval(sql, hosp), pipe.predict(hosp), atol=1e-12)


class TestInliningRuleOnSpark:
    def test_inlined_plan_matches_mapinpandas(self, spark):
        df = hospital.joined_frame(1500, seed=9)
        catalog = Catalog().add_table("joined", list(df.columns), {"pid"})
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=hospital.FEATURES, scale=False),
            DecisionTree(task="regression", max_depth=4, min_samples_leaf=10),
        ).fit(df[hospital.FEATURES], df["los"].to_numpy())
        plan = MLPredict(Scan("joined"), "los", pipe, "pred")
        inlined, changed = ModelInlining().apply(plan, catalog)
        assert changed
        assert isinstance(inlined, Project)
        tables = {"joined": spark.createDataFrame(df)}
        a = (
            to_dataframe(plan, spark, tables)
            .select("pid", "pred")
            .toPandas()
            .sort_values("pid")
            .reset_index(drop=True)
        )
        b = (
            to_dataframe(inlined, spark, tables)
            .select("pid", "pred")
            .toPandas()
            .sort_values("pid")
            .reset_index(drop=True)
        )
        pd.testing.assert_frame_equal(a, b)

    def test_uninlinable_model_left_alone(self):
        from repro.miniml import MLPClassifier

        rng = np.random.default_rng(0)
        df = pd.DataFrame({"a": rng.random(300)})
        y = (df["a"] > 0.5).astype(int).to_numpy()
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=["a"]), MLPClassifier(hidden=(4,), epochs=2)
        ).fit(df, y)
        catalog = Catalog().add_table("t", ["a"], set())
        plan = MLPredict(Scan("t"), "m", pipe, "p", kind="proba")
        out, changed = ModelInlining().apply(plan, catalog)
        assert not changed
        assert isinstance(out, MLPredict)
