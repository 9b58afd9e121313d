"""Unit tests for featurizers and the Pipeline wrapper."""
import numpy as np
import pandas as pd
import pytest

from repro.miniml import (
    DecisionTree,
    LogisticRegressionL1,
    OneHotEncoder,
    Pipeline,
    StandardScaler,
    TableFeaturizer,
)


def _df(n=200, seed=0):
    rng = np.random.default_rng(seed)
    return pd.DataFrame(
        {
            "age": rng.integers(18, 90, n),
            "bp": rng.normal(120, 15, n),
            "city": rng.choice(["NYC", "SEA", "SFO"], n),
            "carrier": rng.choice(["AA", "DL"], n),
        }
    )


class TestOneHot:
    def test_fit_sorts_categories(self):
        enc = OneHotEncoder().fit(["b", "a", "c", "a"])
        assert enc.categories_ == ["a", "b", "c"]

    def test_transform_matrix(self):
        enc = OneHotEncoder().fit(["a", "b"])
        out = enc.transform(["b", "a", "b"])
        np.testing.assert_array_equal(out, [[0, 1], [1, 0], [0, 1]])

    def test_unseen_category_all_zero(self):
        enc = OneHotEncoder().fit(["a", "b"])
        out = enc.transform(["z"])
        np.testing.assert_array_equal(out, [[0, 0]])

    def test_codes(self):
        enc = OneHotEncoder().fit(["a", "b", "c"])
        np.testing.assert_array_equal(enc.codes(["c", "a", "z"]), [2, 0, -1])


class TestScaler:
    def test_standardizes(self):
        X = np.random.default_rng(0).normal(5, 3, (1000, 2))
        sc = StandardScaler().fit(X)
        Z = sc.transform(X)
        np.testing.assert_allclose(Z.mean(axis=0), 0, atol=1e-9)
        np.testing.assert_allclose(Z.std(axis=0), 1, atol=1e-9)

    def test_constant_column_no_divzero(self):
        X = np.ones((10, 1))
        Z = StandardScaler().fit(X).transform(X)
        assert np.isfinite(Z).all()


class TestTableFeaturizer:
    def test_feature_names_order(self):
        f = TableFeaturizer(numeric_cols=["age", "bp"], categorical_cols=["city"])
        f.fit(_df())
        assert f.feature_names[:2] == ["age", "bp"]
        assert f.feature_names[2:] == ["city=NYC", "city=SEA", "city=SFO"]

    def test_transform_shape(self):
        f = TableFeaturizer(
            numeric_cols=["age"], categorical_cols=["city", "carrier"]
        ).fit(_df())
        X = f.transform(_df(50, seed=1))
        assert X.shape == (50, 1 + 3 + 2)
        assert X.shape[1] == f.n_features

    def test_no_scaling_option(self):
        df = _df()
        f = TableFeaturizer(numeric_cols=["age"], scale=False).fit(df)
        np.testing.assert_array_equal(f.transform(df)[:, 0], df["age"].to_numpy())

    def test_onehot_block_exactly_one_hot(self):
        df = _df()
        f = TableFeaturizer(categorical_cols=["city"]).fit(df)
        X = f.transform(df)
        np.testing.assert_allclose(X.sum(axis=1), 1.0)

    def test_input_cols(self):
        f = TableFeaturizer(numeric_cols=["age"], categorical_cols=["city"])
        assert f.input_cols == ["age", "city"]

    def test_transform_codes(self):
        df = _df(30)
        f = TableFeaturizer(numeric_cols=["age"], categorical_cols=["city"]).fit(df)
        parts = f.transform_codes(df)
        assert set(parts) == {"num", "cat_city"}
        assert parts["num"].shape == (30, 1)
        assert parts["cat_city"].dtype == np.int64

    def test_drop_numeric_feature(self):
        df = _df()
        f = TableFeaturizer(numeric_cols=["age", "bp"], categorical_cols=["city"]).fit(df)
        new, keep = f.drop_features({"bp"})
        assert new.numeric_cols == ["age"]
        assert "bp" not in new.input_cols
        np.testing.assert_array_equal(
            new.transform(df), f.transform(df)[:, keep]
        )

    def test_drop_whole_categorical_block_drops_column(self):
        df = _df()
        f = TableFeaturizer(numeric_cols=["age"], categorical_cols=["city"]).fit(df)
        new, keep = f.drop_features({"city=NYC", "city=SEA", "city=SFO"})
        assert new.categorical_cols == []
        assert new.input_cols == ["age"]
        assert len(keep) == 1

    def test_drop_partial_categorical_block(self):
        df = _df()
        f = TableFeaturizer(categorical_cols=["city"]).fit(df)
        new, keep = f.drop_features({"city=SEA"})
        assert new.encoders["city"].categories_ == ["NYC", "SFO"]
        np.testing.assert_array_equal(new.transform(df), f.transform(df)[:, keep])

    def test_bind_categorical(self):
        df = _df()
        f = TableFeaturizer(numeric_cols=["age"], categorical_cols=["city"]).fit(df)
        new, consts, keep = f.bind_categorical("city", "SEA")
        assert consts == {"city=NYC": 0.0, "city=SEA": 1.0, "city=SFO": 0.0}
        assert new.input_cols == ["age"]
        # on rows where city==SEA, old transform == [new transform, consts]
        sea = df[df.city == "SEA"]
        old = f.transform(sea)
        newX = new.transform(sea)
        np.testing.assert_array_equal(old[:, keep], newX)

    def test_bind_categorical_missing_col_raises(self):
        f = TableFeaturizer(categorical_cols=["city"]).fit(_df())
        with pytest.raises(KeyError):
            f.bind_categorical("nope", "x")


class TestPipeline:
    def test_fit_predict_tree(self):
        df = _df(400)
        y = ((df["age"] > 50) & (df["city"] == "NYC")).astype(int).to_numpy()
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=["age", "bp"], categorical_cols=["city"]),
            DecisionTree(max_depth=4, min_samples_leaf=2),
        ).fit(df, y)
        assert np.mean(pipe.predict(df) == y) > 0.95

    def test_fit_predict_logistic(self):
        df = _df(400)
        y = (df["age"] > 50).astype(int).to_numpy()
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=["age"], categorical_cols=["carrier"]),
            LogisticRegressionL1(alpha=0.0),
        ).fit(df, y)
        assert np.mean(pipe.predict(df) == y) > 0.95

    def test_predict_row_matches_batch(self):
        df = _df(100)
        y = (df["age"] > 50).astype(int).to_numpy()
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=["age", "bp"], categorical_cols=["city"]),
            DecisionTree(max_depth=4, min_samples_leaf=2),
        ).fit(df, y)
        batch = pipe.predict(df)
        rows = [pipe.predict_row(r._asdict()) for r in df.itertuples(index=False)]
        np.testing.assert_array_equal(batch, rows)

    def test_input_cols_exposed(self):
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=["age"], categorical_cols=["city"]),
            DecisionTree(),
        )
        assert pipe.input_cols == ["age", "city"]
