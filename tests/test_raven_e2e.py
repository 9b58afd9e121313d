"""End-to-end inference queries through the full Raven path:
analyze → cross-optimize → codegen → Spark, checked for result
equivalence (optimized vs unoptimized, and against the DuckDB oracle
for the relational skeleton)."""
import numpy as np
import pandas as pd
import pytest

from repro.datasets import hospital
from repro.ir import Catalog, Join, MLPredict, Scan, walk
from repro.miniml import DecisionTree, Pipeline, TableFeaturizer
from repro.optimizer import CrossOptimizer, default_rules
from repro.optimizer.inlining import ModelInlining
from repro.raven import Raven


@pytest.fixture(scope="module")
def setup(spark):
    n = 2000
    t = hospital.tables(n, seed=31)
    train = hospital.joined_frame(n, seed=31)
    pipe = Pipeline(
        TableFeaturizer(numeric_cols=hospital.FEATURES, scale=False),
        DecisionTree(task="regression", max_depth=6, min_samples_leaf=20),
    ).fit(train[hospital.FEATURES], train["los"].to_numpy())
    catalog = (
        Catalog()
        .add_table("patient_info", ["pid", "age", "gender", "pregnant", "smoker"], {"pid"})
        .add_table("blood_tests", ["pid", "bp", "hematocrit", "glucose"], {"pid"})
        .add_table("prenatal_tests", ["pid", "trimester", "fetal_hr"], {"pid"})
    )
    raven = Raven(
        spark=spark,
        catalog=catalog,
        tables={k: spark.createDataFrame(v) for k, v in t.items()},
    )
    raven.register_model("los_model", pipe, kind="label")
    return raven, pipe, train


RUNNING_EXAMPLE = (
    "SELECT pid, age, PREDICT(MODEL los_model) AS predicted_los "
    "FROM patient_info "
    "JOIN blood_tests ON pid = pid "
    "JOIN prenatal_tests ON pid = pid "
    "WHERE pregnant = 1 AND predicted_los > 7"
)


class TestRunningExample:
    def test_optimized_equals_unoptimized(self, setup):
        raven, _, _ = setup
        a = raven.run(RUNNING_EXAMPLE, optimize=False).toPandas().sort_values("pid").reset_index(drop=True)
        b = raven.run(RUNNING_EXAMPLE, optimize=True).toPandas().sort_values("pid").reset_index(drop=True)
        pd.testing.assert_frame_equal(a, b)

    def test_optimizer_prunes_model(self, setup):
        raven, pipe, _ = setup
        plan = raven.analyze_sql(RUNNING_EXAMPLE)
        report = raven.optimize(plan)
        ml = next(n for n in walk(report.plan) if isinstance(n, MLPredict))
        assert ml.pipeline.model.n_nodes < pipe.model.n_nodes
        assert "predicate_based_model_pruning" in report.applied

    def test_gender_dropped_after_pruning(self, setup):
        """Fig. 1: pregnant=1 prunes the non-pregnant branch; gender was
        only used there, so projection pushdown removes it."""
        raven, _, _ = setup
        plan = raven.analyze_sql(RUNNING_EXAMPLE)
        report = raven.optimize(plan)
        ml = next(n for n in walk(report.plan) if isinstance(n, MLPredict))
        assert "gender" not in ml.pipeline.input_cols

    def test_result_matches_local_reference(self, setup):
        raven, pipe, train = setup
        got = (
            raven.run(RUNNING_EXAMPLE)
            .toPandas()
            .sort_values("pid")
            .reset_index(drop=True)
        )
        ref = train.copy()
        ref["predicted_los"] = pipe.predict(ref)
        ref = ref[(ref["pregnant"] == 1) & (ref["predicted_los"] > 7)]
        ref = ref[["pid", "age", "predicted_los"]].sort_values("pid").reset_index(drop=True)
        got["age"] = got["age"].astype(ref["age"].dtype)
        pd.testing.assert_frame_equal(got, ref, check_dtype=False)

    def test_inlined_run_matches(self, setup):
        raven, _, _ = setup
        plan = raven.analyze_sql(RUNNING_EXAMPLE)
        opt = CrossOptimizer(rules=default_rules() + [ModelInlining()])
        inlined = opt.optimize(plan, raven.catalog).plan
        assert not any(isinstance(n, MLPredict) for n in walk(inlined))
        a = raven.run(RUNNING_EXAMPLE).toPandas().sort_values("pid").reset_index(drop=True)
        b = raven.execute(inlined).toPandas().sort_values("pid").reset_index(drop=True)
        pd.testing.assert_frame_equal(a, b, check_dtype=False)

    def test_python_script_path(self, setup):
        raven, pipe, train = setup
        script = """
df = patient_info.merge(blood_tests, on="pid")
df = df.merge(prenatal_tests, on="pid")
df = df[df["pregnant"] == 1]
pred = los_model.predict(df)
"""
        res = raven.analyze_python(script)
        assert res.udf_count == 0
        plan = res.plans[0]
        df = raven.execute(plan).toPandas().sort_values("pid")
        ref = train[train["pregnant"] == 1].sort_values("pid")
        np.testing.assert_allclose(df["prediction"].to_numpy(), pipe.predict(ref))

    def test_static_analysis_under_10ms(self, setup):
        """§3.2: 'in most practical cases ... less than 10 msec'."""
        raven, _, _ = setup
        script = "df = patient_info.merge(blood_tests, on=\"pid\")\npred = los_model.predict(df)\n"
        times = [raven.analyze_python(script).elapsed_ms for _ in range(20)]
        assert sorted(times)[len(times) // 2] < 10.0
