"""T6 benchmark: predicate-based pruning — tree pruning and one-hot
folding regression points at 200K rows."""
import pytest

from repro.datasets import flights
from repro.ir import Constraint
from repro.optimizer.pruning import prune_pipeline


@pytest.fixture(scope="module")
def tree_variants(hosp_tree, hosp_frame):
    pruned, changed = prune_pipeline(hosp_tree, {"pregnant": Constraint(eq=1)})
    assert changed
    pregnant = hosp_frame[hosp_frame["pregnant"] == 1]
    return hosp_tree, pruned, pregnant


def test_tree_full(benchmark, tree_variants):
    pipe, _, data = tree_variants
    benchmark.pedantic(lambda: pipe.predict(data), rounds=5, warmup_rounds=1)


def test_tree_pruned(benchmark, tree_variants):
    _, pruned, data = tree_variants
    benchmark.extra_info["nodes"] = pruned.model.n_nodes
    benchmark.pedantic(lambda: pruned.predict(data), rounds=5, warmup_rounds=1)


@pytest.fixture(scope="module")
def cat_variants(fl_lr_dense):
    data = flights.frame(200_000, seed=107, dest_skew=1.2)
    sub = data[data["dest"] == "A00"]
    folded, changed = prune_pipeline(fl_lr_dense, {"dest": Constraint(eq="A00")})
    assert changed
    return fl_lr_dense, folded, sub


def test_categorical_full(benchmark, cat_variants):
    pipe, _, sub = cat_variants
    benchmark.pedantic(lambda: pipe.predict_proba(sub)[:, 1], rounds=5, warmup_rounds=1)


def test_categorical_folded(benchmark, cat_variants):
    _, folded, sub = cat_variants
    benchmark.extra_info["features"] = folded.featurizer.n_features
    benchmark.pedantic(lambda: folded.predict_proba(sub)[:, 1], rounds=5, warmup_rounds=1)
