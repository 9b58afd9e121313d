"""Model/query splitting (§2): partition a tree model at its root split
into two cheaper models, turning the plan into a UNION of two branches
that can then be optimized independently (the paper notes the left
branch of the running example becomes cheap enough to inline, and its
join with prenatal_tests can be dropped).

The split predicate is expressed over the *raw* column (thresholds
inverted through the scaler), so each branch's Filter is a plain
relational predicate — which predicate-based pruning then consumes to
specialize each branch's model further.
"""
from __future__ import annotations

import copy

from repro.ir import Cmp, Col, Filter, Lit, Not, PlanNode, Union
from repro.ir.ops import MLPredict
from repro.ir.plan import Catalog
from repro.miniml.pipeline import Pipeline
from repro.miniml.tree import LEAF, DecisionTree
from repro.optimizer.inlining import _raw_threshold
from repro.optimizer.rules import Rule


def split_predict(node: MLPredict) -> Union | None:
    """Split one tree-backed MLPredict at its root. Returns None when
    not applicable (non-tree model, leaf-only tree, categorical root)."""
    pipe = node.pipeline
    if not (isinstance(pipe, Pipeline) and isinstance(pipe.model, DecisionTree)):
        return None
    tree: DecisionTree = pipe.model
    if tree.feature[0] == LEAF:
        return None
    try:
        col, t = _raw_threshold(pipe.featurizer, int(tree.feature[0]), float(tree.threshold[0]))
    except ValueError:
        return None

    left_pipe = Pipeline(copy.deepcopy(pipe.featurizer), tree.subtree(int(tree.left[0])))
    right_pipe = Pipeline(copy.deepcopy(pipe.featurizer), tree.subtree(int(tree.right[0])))
    pred = Cmp("<=", Col(col), Lit(float(t)))

    left = copy.copy(node)
    left.child = Filter(node.child, pred)
    left.pipeline = left_pipe
    right = copy.copy(node)
    right.child = Filter(node.child, Not(pred))
    right.pipeline = right_pipe
    return Union([left, right])


class ModelQuerySplitting(Rule):
    """Split every splittable tree MLPredict once (one root split per
    optimizer sweep; repeated sweeps split deeper)."""

    name = "model_query_splitting"

    def __init__(self, max_splits: int = 1):
        self.max_splits = max_splits
        self._done = 0

    def apply(self, plan: PlanNode, catalog: Catalog) -> tuple[PlanNode, bool]:
        changed_any = False

        def rewrite(node: PlanNode) -> PlanNode:
            nonlocal changed_any
            new_children = [rewrite(c) for c in node.children]
            if new_children != node.children:
                node = node.with_children(new_children)
            if (
                isinstance(node, MLPredict)
                and self._done < self.max_splits
            ):
                split = split_predict(node)
                if split is not None:
                    self._done += 1
                    changed_any = True
                    return split
            return node

        return rewrite(plan), changed_any
