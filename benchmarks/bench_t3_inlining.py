"""T3 benchmark: external scoring vs inlined SQL (Fig. 2c) at 200K
hospital rows."""
import pytest

from repro.experiments.t3_model_inlining import _plans
from repro.ir import Catalog
from repro.runtime.codegen import to_dataframe
from repro.runtime.timing import force


@pytest.fixture(scope="module")
def setup(spark, hosp_frame, hosp_tree):
    sdf = spark.createDataFrame(hosp_frame).cache()
    sdf.count()
    catalog = Catalog().add_table("joined", list(hosp_frame.columns), {"pid"})
    plans = _plans(hosp_tree, catalog)
    yield spark, sdf, plans, hosp_tree
    sdf.unpersist()


def test_external_baseline(benchmark, setup):
    spark, sdf, plans, pipe = setup
    benchmark.pedantic(lambda: pipe.predict(sdf.toPandas()), rounds=3, warmup_rounds=1)


def test_inlined_sql(benchmark, setup):
    spark, sdf, plans, _ = setup
    df = to_dataframe(plans["inlined"], spark, {"joined": sdf})
    benchmark.pedantic(lambda: force(df), rounds=3, warmup_rounds=1)


def test_inlined_pruned_sql(benchmark, setup):
    spark, sdf, plans, _ = setup
    df = to_dataframe(plans["inlined+pruned"], spark, {"joined": sdf})
    benchmark.pedantic(lambda: force(df), rounds=3, warmup_rounds=1)
