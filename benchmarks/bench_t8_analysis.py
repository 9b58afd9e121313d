"""T8 benchmark: static-analysis latency (§3.2, <10 ms claim)."""
import pytest

from repro.analyzer import analyze_script
from repro.experiments.t8_static_analysis import SCRIPTS
from repro.experiments.common import hospital_tree_pipeline
from repro.ir import Catalog


@pytest.fixture(scope="module")
def env():
    catalog = (
        Catalog()
        .add_table("patient_info", ["pid", "age", "gender", "pregnant", "smoker"], {"pid"})
        .add_table("blood_tests", ["pid", "bp", "hematocrit", "glucose"], {"pid"})
        .add_table("prenatal_tests", ["pid", "trimester", "fetal_hr"], {"pid"})
    )
    models = {"los_model": (hospital_tree_pipeline(n_train=5_000, seed=0), "label")}
    return catalog, models


@pytest.mark.parametrize("script_name", list(SCRIPTS))
def test_analyze(benchmark, env, script_name):
    catalog, models = env
    result = benchmark(
        analyze_script, SCRIPTS[script_name], catalog, models, result_var="pred"
    )
    assert result.plans
    # the paper's claim: static analysis under 10 ms
    assert benchmark.stats["median"] < 0.010
