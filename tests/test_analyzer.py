"""Tests for the SQL parser and Python static analyzer."""
import numpy as np
import pandas as pd
import pytest

from repro.analyzer import analyze_script, parse_inference_query
from repro.datasets import hospital
from repro.ir import (
    Catalog,
    Cmp,
    Filter,
    Join,
    MLPredict,
    Project,
    Scan,
    UDFNode,
    walk,
)
from repro.miniml import DecisionTree, Pipeline, TableFeaturizer


@pytest.fixture(scope="module")
def catalog():
    return (
        Catalog()
        .add_table("patient_info", ["pid", "age", "gender", "pregnant", "smoker"], {"pid"})
        .add_table("blood_tests", ["pid", "bp", "hematocrit", "glucose"], {"pid"})
        .add_table("prenatal_tests", ["pid", "trimester", "fetal_hr"], {"pid"})
    )


@pytest.fixture(scope="module")
def los_model():
    df = hospital.joined_frame(2000, seed=0)
    pipe = Pipeline(
        TableFeaturizer(numeric_cols=hospital.FEATURES, scale=False),
        DecisionTree(task="regression", max_depth=5, min_samples_leaf=10),
    ).fit(df[hospital.FEATURES], df["los"].to_numpy())
    return pipe


@pytest.fixture(scope="module")
def models(los_model):
    return {"los_model": (los_model, "label")}


QM = """
SELECT pid, age, PREDICT(MODEL los_model) AS predicted_los
FROM patient_info
JOIN blood_tests ON patient_info_pid = pid
WHERE pregnant = 1 AND predicted_los > 7
"""


class TestSqlParser:
    def test_running_example_structure(self, catalog, models):
        sql = (
            "SELECT pid, age, PREDICT(MODEL los_model) AS predicted_los "
            "FROM patient_info "
            "JOIN blood_tests ON pid = pid "
            "JOIN prenatal_tests ON pid = pid "
            "WHERE pregnant = 1 AND predicted_los > 7"
        )
        plan = parse_inference_query(sql, catalog, models)
        kinds = [type(n).__name__ for n in walk(plan)]
        assert kinds.count("Scan") == 3
        assert kinds.count("Join") == 2
        assert kinds.count("MLPredict") == 1
        assert kinds.count("Filter") == 2  # pregnant below, predicted_los above
        assert isinstance(plan, Project)

    def test_predicate_split_base_vs_alias(self, catalog, models):
        sql = (
            "SELECT pid, PREDICT(MODEL los_model) AS p "
            "FROM patient_info JOIN blood_tests ON pid = pid "
            "JOIN prenatal_tests ON pid = pid "
            "WHERE age > 30 AND p > 5"
        )
        plan = parse_inference_query(sql, catalog, models)
        # top: Project -> Filter(p) -> MLPredict -> Filter(age) -> joins
        assert isinstance(plan.child, Filter)
        assert plan.child.predicate.columns() == {"p"}
        ml = plan.child.child
        assert isinstance(ml, MLPredict)
        assert isinstance(ml.child, Filter)
        assert ml.child.predicate.columns() == {"age"}

    def test_join_one_to_one_from_catalog(self, catalog, models):
        sql = (
            "SELECT pid FROM patient_info JOIN blood_tests ON pid = pid"
        )
        plan = parse_inference_query(sql, catalog, {})
        join = next(n for n in walk(plan) if isinstance(n, Join))
        assert join.fk_one_to_one

    def test_star_select(self, catalog):
        plan = parse_inference_query("SELECT * FROM patient_info WHERE age > 40", catalog, {})
        assert isinstance(plan, Filter)
        assert isinstance(plan.child, Scan)

    def test_string_literals_and_or(self, catalog):
        cat = Catalog().add_table("flights", ["dest", "dep_delay"], set())
        plan = parse_inference_query(
            "SELECT dest FROM flights WHERE dest = 'A01' OR dep_delay > 10", cat, {}
        )
        f = plan.child
        assert isinstance(f, Filter)
        assert "OR" in f.predicate.to_sql()

    def test_aliases(self, catalog):
        plan = parse_inference_query(
            "SELECT age AS patient_age FROM patient_info", catalog, {}
        )
        assert plan.output_names == ["patient_age"]

    def test_unknown_table_raises(self, catalog):
        with pytest.raises(KeyError, match="unknown table"):
            parse_inference_query("SELECT x FROM nope", catalog, {})

    def test_unknown_model_raises(self, catalog):
        with pytest.raises(KeyError, match="unknown model"):
            parse_inference_query(
                "SELECT PREDICT(MODEL ghost) AS p FROM patient_info", catalog, {}
            )

    def test_unknown_where_column_raises(self, catalog):
        with pytest.raises(KeyError, match="unknown WHERE columns"):
            parse_inference_query(
                "SELECT pid FROM patient_info WHERE nocol = 1", catalog, {}
            )

    def test_predict_without_alias_raises(self, catalog, models):
        with pytest.raises(SyntaxError, match="AS alias"):
            parse_inference_query(
                "SELECT PREDICT(MODEL los_model) FROM patient_info", catalog, models
            )

    def test_trailing_garbage_raises(self, catalog):
        with pytest.raises(SyntaxError, match="trailing"):
            parse_inference_query(
                "SELECT pid FROM patient_info LIMIT 5", catalog, {}
            )

    def test_explicit_predict_columns_checked(self, catalog, models):
        with pytest.raises(ValueError, match="input columns"):
            parse_inference_query(
                "SELECT PREDICT(MODEL los_model, age) AS p FROM patient_info",
                catalog,
                models,
            )

    def test_parenthesized_where(self, catalog):
        plan = parse_inference_query(
            "SELECT pid FROM patient_info WHERE (age > 30 AND gender = 1) OR smoker = 1",
            catalog,
            {},
        )
        assert isinstance(plan.child, Filter)

    def test_not_predicate(self, catalog):
        plan = parse_inference_query(
            "SELECT pid FROM patient_info WHERE NOT age > 30", catalog, {}
        )
        assert "NOT" in plan.child.predicate.to_sql()


class TestPyAnalyzer:
    def test_running_example_script(self, catalog, models):
        script = """
df = patient_info.merge(blood_tests, on="pid")
df = df.merge(prenatal_tests, on="pid")
df = df[df["pregnant"] == 1]
pred = los_model.predict(df)
"""
        res = analyze_script(script, catalog, models)
        assert len(res.plans) == 1
        assert res.udf_count == 0
        kinds = [type(n).__name__ for n in walk(res.plans[0])]
        assert kinds.count("Join") == 2
        assert kinds.count("Filter") == 1
        assert kinds.count("MLPredict") == 1

    def test_attribute_style_filter(self, catalog, models):
        script = "df = patient_info[patient_info.age > 40]\n"
        res = analyze_script(script, catalog, models)
        f = res.plans[0]
        assert isinstance(f, Filter)
        assert f.predicate.to_sql() == "(age > 40)"

    def test_column_projection(self, catalog, models):
        script = 'X = patient_info[["age", "gender"]]\n'
        res = analyze_script(script, catalog, models)
        assert isinstance(res.plans[0], Project)
        assert res.plans[0].output_names == ["age", "gender"]

    def test_conditional_produces_two_plans(self, catalog, models):
        script = """
use_filter = True
if use_filter:
    df = patient_info[patient_info["age"] > 40]
else:
    df = patient_info
"""
        res = analyze_script(script, catalog, models, result_var="df")
        assert len(res.plans) == 2
        assert isinstance(res.plans[0], Filter)
        assert isinstance(res.plans[1], Scan)

    def test_loop_falls_back_to_udf(self, catalog, models):
        script = """
df = patient_info[patient_info["age"] > 40]
for i in range(2):
    df = df
"""
        res = analyze_script(script, catalog, models, result_var="df")
        assert res.udf_count == 1
        assert any(isinstance(n, UDFNode) for n in walk(res.plans[0]))

    def test_unknown_call_becomes_executable_udf(self, catalog, models):
        script = """
df = patient_info[patient_info["age"] > 40]
df2 = df.assign(age2=df["age"] * 2)
"""
        res = analyze_script(script, catalog, models, result_var="df2")
        udf = res.plans[0]
        assert isinstance(udf, UDFNode)
        pdf = pd.DataFrame({"age": [50, 60]})
        out = udf.fn(pdf)
        assert list(out["age2"]) == [100, 120]

    def test_predict_proba_kind(self, catalog):
        rng = np.random.default_rng(0)
        df = pd.DataFrame({"age": rng.integers(18, 90, 100).astype(float)})
        y = (df["age"] > 50).astype(int).to_numpy()
        pipe = Pipeline(
            TableFeaturizer(numeric_cols=["age"], scale=False),
            DecisionTree(max_depth=2, min_samples_leaf=1),
        ).fit(df, y)
        res = analyze_script(
            "p = clf.predict_proba(patient_info)\n",
            catalog,
            {"clf": (pipe, "label")},
        )
        ml = res.plans[0]
        assert isinstance(ml, MLPredict)
        assert ml.kind == "proba"

    def test_latency_recorded(self, catalog, models):
        res = analyze_script("df = patient_info\n", catalog, models, result_var="df")
        assert res.elapsed_ms > 0

    def test_missing_result_var_raises(self, catalog, models):
        with pytest.raises(ValueError):
            analyze_script("df = patient_info\n", catalog, models, result_var="nope")

    def test_imports_ignored(self, catalog, models):
        res = analyze_script(
            "import pandas as pd\ndf = patient_info\n", catalog, models
        )
        assert res.udf_count == 0
