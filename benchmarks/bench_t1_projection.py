"""T1 benchmark: inference with vs without model-projection pushdown
(Fig. 2a). Regression points at 200K rows for the two sparsity levels."""
import pytest

from repro.experiments.t1_projection_pushdown import pick_models
from repro.optimizer.projection import shrink_linear


@pytest.fixture(scope="module")
def models():
    low, high = pick_models(n_train=30_000, seed=0)
    return {
        "low": (low, shrink_linear(low)[0]),
        "high": (high, shrink_linear(high)[0]),
    }


@pytest.mark.parametrize("sparsity", ["low", "high"])
def test_baseline(benchmark, models, fl_frame, sparsity):
    pipe, _ = models[sparsity]
    benchmark.extra_info["sparsity_pct"] = 100 * pipe.model.sparsity
    benchmark.pedantic(lambda: pipe.predict_proba(fl_frame), rounds=5, warmup_rounds=1)


@pytest.mark.parametrize("sparsity", ["low", "high"])
def test_pushdown(benchmark, models, fl_frame, sparsity):
    pipe, pushed = models[sparsity]
    benchmark.extra_info["features_after"] = pushed.featurizer.n_features
    benchmark.pedantic(lambda: pushed.predict_proba(fl_frame), rounds=5, warmup_rounds=1)
