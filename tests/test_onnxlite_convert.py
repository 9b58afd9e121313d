"""NN-translation correctness: compiled graphs must reproduce the
source miniml model's predictions exactly (same float ops, same data)."""
import numpy as np
import pandas as pd
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.miniml import (
    DecisionTree,
    LogisticRegressionL1,
    MLPClassifier,
    Pipeline,
    RandomForest,
    TableFeaturizer,
)
from repro.onnxlite import optimize
from repro.onnxlite.convert import (
    forest_to_graph,
    linear_to_graph,
    mlp_to_graph,
    pipeline_to_graph,
    tree_to_graph,
)


def _data(n=300, d=5, seed=0):
    rng = np.random.default_rng(seed)
    X = rng.standard_normal((n, d))
    y = (X[:, 0] + X[:, 1] * X[:, 2] > 0).astype(int)
    return X, y


class TestTreeToGEMM:
    def test_matches_tree_predict_value(self):
        X, y = _data()
        t = DecisionTree(max_depth=5, min_samples_leaf=2).fit(X, y)
        g = tree_to_graph(t)
        out = g.run({"X": X})["value"]
        np.testing.assert_allclose(out, t.predict_value(X))

    def test_regression_tree(self):
        rng = np.random.default_rng(1)
        X = rng.random((200, 3))
        yr = 5 * X[:, 0] + np.where(X[:, 1] > 0.5, 3.0, -3.0)
        t = DecisionTree(task="regression", max_depth=4, min_samples_leaf=4).fit(X, yr)
        g = tree_to_graph(t)
        np.testing.assert_allclose(g.run({"X": X})["value"][:, 0], t.predict(X))

    def test_single_leaf_tree(self):
        X = np.random.default_rng(0).random((20, 3))
        y = np.ones(20, dtype=int)
        t = DecisionTree().fit(X, y)
        g = tree_to_graph(t)
        out = g.run({"X": X})["value"]
        assert out.shape == (20, 1)
        np.testing.assert_allclose(out, 1.0)

    def test_exactly_one_leaf_selected_per_row(self):
        X, y = _data(100)
        t = DecisionTree(max_depth=6, min_samples_leaf=1).fit(X, y)
        g = tree_to_graph(t)
        # intercept the leaf indicator: rerun manually up to 'lf'
        g2 = optimize(g)
        # run the unoptimized graph and grab the indicator tensor
        env = dict(g.initializers)
        env["X"] = X
        from repro.onnxlite.ops import KERNELS

        for node in g.toposorted():
            env[node.output] = KERNELS[node.op_type](
                [env[i] for i in node.inputs], node.attrs
            )
        lf = env["t0_lf"]
        np.testing.assert_allclose(lf.sum(axis=1), 1.0)
        np.testing.assert_allclose(g2.run({"X": X})["value"], t.predict_value(X))

    @settings(max_examples=15, deadline=None)
    @given(st.integers(0, 10_000), st.integers(1, 6))
    def test_random_trees_match(self, seed, depth):
        rng = np.random.default_rng(seed)
        X = rng.standard_normal((120, 4))
        y = (np.sin(X[:, 0]) + X[:, 1] > 0).astype(int)
        if len(np.unique(y)) < 2:
            return
        t = DecisionTree(max_depth=depth, min_samples_leaf=2).fit(X, y)
        g = tree_to_graph(t)
        Xq = rng.standard_normal((80, 4))
        np.testing.assert_allclose(g.run({"X": Xq})["value"], t.predict_value(Xq))


class TestForestToGraph:
    def test_matches_forest_proba(self):
        X, y = _data(400)
        rf = RandomForest(n_trees=7, max_depth=4, max_features=0.6, seed=3).fit(X, y)
        g = forest_to_graph(rf)
        np.testing.assert_allclose(g.run({"X": X})["value"], rf.predict_proba(X))

    def test_regression_forest(self):
        rng = np.random.default_rng(2)
        X = rng.random((300, 4))
        yr = X[:, 0] * 10 + X[:, 1]
        rf = RandomForest(n_trees=4, task="regression", max_depth=4).fit(X, yr)
        g = forest_to_graph(rf)
        np.testing.assert_allclose(g.run({"X": X})["value"][:, 0], rf.predict(X))

    def test_optimized_graph_matches(self):
        X, y = _data(200)
        rf = RandomForest(n_trees=3, max_depth=3, seed=1).fit(X, y)
        g = optimize(forest_to_graph(rf))
        np.testing.assert_allclose(g.run({"X": X})["value"], rf.predict_proba(X))


class TestLinearToGraph:
    def test_logistic_score_and_proba(self):
        X, y = _data(300)
        m = LogisticRegressionL1(alpha=0.01).fit(X, y)
        out = linear_to_graph(m).run({"X": X})
        np.testing.assert_allclose(out["score"], m.decision_function(X))
        np.testing.assert_allclose(out["proba"], m.predict_proba(X)[:, 1])

    def test_linear_regression_score(self):
        from repro.miniml import LinearRegression

        rng = np.random.default_rng(0)
        X = rng.standard_normal((100, 3))
        m = LinearRegression().fit(X, X @ np.array([1.0, 2.0, 3.0]))
        out = linear_to_graph(m).run({"X": X})
        np.testing.assert_allclose(out["score"], m.predict(X))
        assert "proba" not in out


class TestMLPToGraph:
    def test_matches_mlp(self):
        X, y = _data(300)
        m = MLPClassifier(hidden=(16, 8), epochs=5, seed=0).fit(X, y)
        out = mlp_to_graph(m).run({"X": X})
        np.testing.assert_allclose(out["score"], m.decision_function(X))
        np.testing.assert_allclose(out["proba"], m.predict_proba(X)[:, 1])


def _mixed_df(n=400, seed=0):
    rng = np.random.default_rng(seed)
    return pd.DataFrame(
        {
            "age": rng.integers(18, 90, n).astype(float),
            "bp": rng.normal(120, 15, n),
            "dest": rng.choice(["JFK", "SEA", "SFO", "LAX"], n),
            "carrier": rng.choice(["AA", "DL", "UA"], n),
        }
    )


class TestPipelineToGraph:
    def _pipe(self, model, seed=0):
        df = _mixed_df(seed=seed)
        y = ((df["age"] > 50) & (df["dest"] == "JFK")).astype(int).to_numpy()
        # guarantee both classes
        y[:5] = 1
        y[5:10] = 0
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=["age", "bp"], categorical_cols=["dest", "carrier"]),
            model,
        ).fit(df, y)
        return pipe, df

    def test_tree_pipeline(self):
        pipe, df = self._pipe(DecisionTree(max_depth=4, min_samples_leaf=2))
        g = pipeline_to_graph(pipe)
        feeds = pipe.featurizer.transform_codes(df)
        np.testing.assert_allclose(
            g.run(feeds)["value"], pipe.model.predict_value(pipe.featurizer.transform(df))
        )

    def test_forest_pipeline(self):
        pipe, df = self._pipe(RandomForest(n_trees=4, max_depth=3, seed=2))
        g = pipeline_to_graph(pipe)
        feeds = pipe.featurizer.transform_codes(df)
        np.testing.assert_allclose(g.run(feeds)["value"], pipe.predict_proba(df))

    def test_logistic_pipeline(self):
        pipe, df = self._pipe(LogisticRegressionL1(alpha=0.001))
        g = pipeline_to_graph(pipe)
        feeds = pipe.featurizer.transform_codes(df)
        np.testing.assert_allclose(g.run(feeds)["score"], pipe.decision_function(df))

    def test_mlp_pipeline(self):
        pipe, df = self._pipe(MLPClassifier(hidden=(8,), epochs=3, seed=1))
        g = pipeline_to_graph(pipe)
        feeds = pipe.featurizer.transform_codes(df)
        np.testing.assert_allclose(g.run(feeds)["score"], pipe.decision_function(df))

    def test_serialized_pipeline_roundtrip(self, tmp_path):
        from repro.onnxlite import InferenceSession, save_graph

        pipe, df = self._pipe(DecisionTree(max_depth=3, min_samples_leaf=2))
        g = pipeline_to_graph(pipe)
        p = save_graph(g, str(tmp_path / "pipe"))
        sess = InferenceSession(p)
        feeds = pipe.featurizer.transform_codes(df)
        np.testing.assert_allclose(
            sess.run(feeds)["value"],
            pipe.model.predict_value(pipe.featurizer.transform(df)),
        )

    def test_unsupported_model_raises(self):
        import pytest

        from repro.miniml import KMeans

        pipe = Pipeline(TableFeaturizer(numeric_cols=["age"]), KMeans())
        with pytest.raises(TypeError):
            pipeline_to_graph(pipe)
