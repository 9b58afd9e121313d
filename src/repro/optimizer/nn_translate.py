"""NN translation rule (§4.2): swap MLPredict (classical MLD operator)
for NNPredict (an onnxlite LA graph). The graph runs batch GEMMs
instead of per-tree traversal — the executor can then choose the NN
engine for this operator, as Raven's runtime selection does."""
from __future__ import annotations

import copy

from repro.ir import PlanNode
from repro.ir.ops import MLPredict, NNPredict
from repro.ir.plan import Catalog
from repro.miniml.forest import RandomForest
from repro.miniml.pipeline import Pipeline
from repro.miniml.tree import DecisionTree
from repro.onnxlite import optimize
from repro.onnxlite.convert import pipeline_to_graph
from repro.optimizer.rules import Rule


def translate_predict(node: MLPredict) -> NNPredict:
    """Compile one MLPredict's pipeline to a graph-backed NNPredict."""
    pipe: Pipeline = node.pipeline
    graph = optimize(pipeline_to_graph(pipe))
    classes = None
    model = pipe.model
    if isinstance(model, (DecisionTree, RandomForest)) and model.task == "classification":
        classes = model.classes_
    return NNPredict(
        child=node.child,
        model_name=node.model_name,
        graph=graph,
        featurizer=pipe.featurizer,
        output_col=node.output_col,
        kind=node.kind,
        classes=classes,
    )


class NNTranslation(Rule):
    name = "nn_translation"

    def apply(self, plan: PlanNode, catalog: Catalog) -> tuple[PlanNode, bool]:
        changed_any = False

        def rewrite(node: PlanNode) -> PlanNode:
            nonlocal changed_any
            new_children = [rewrite(c) for c in node.children]
            if new_children != node.children:
                node = node.with_children(new_children)
            if isinstance(node, MLPredict) and isinstance(node.pipeline, Pipeline):
                try:
                    translated = translate_predict(node)
                except TypeError:
                    return node
                changed_any = True
                return translated
            return node

        return rewrite(plan), changed_any
