"""NN translation: compile miniml models and featurizers to onnxlite
graphs (the paper's MLD→LA operator transformation, §4.2).

Decision trees are compiled to the 3-GEMM form (as in Hummingbird): with
internal nodes I, leaves L, features F,

* ``A ∈ R^{F×I}``, ``A[f,i]=1`` iff node *i* tests feature *f*; thresholds
  ``thr ∈ R^I``; then ``E = (X·A ≤ thr)`` evaluates every split at once.
* ``C ∈ R^{I×L}``: for each leaf *l* and internal ancestor *i*, ``+1`` if
  *l* lies in *i*'s left subtree, ``−1`` if right; ``D[l]`` = number of
  left-edges on *l*'s path. A row reaches leaf *l* iff ``(E·C)[l] == D[l]``
  (the maximum is attained only on the true path).
* predictions are the one-hot leaf indicator times the leaf-value matrix.

That turns per-row tree traversal into three dense matmuls — exactly why
the paper's RF-NN beats scikit-learn at small-to-medium batch sizes.
"""
from __future__ import annotations

import numpy as np

from repro.miniml.featurize import TableFeaturizer
from repro.miniml.forest import RandomForest
from repro.miniml.linear import LinearRegression, LogisticRegressionL1
from repro.miniml.mlp import MLPClassifier
from repro.miniml.pipeline import Pipeline
from repro.miniml.tree import LEAF, DecisionTree
from repro.onnxlite.graph import Graph, Node


def _tree_gemm_tensors(tree: DecisionTree, value: np.ndarray):
    """Build (A, thr, C, D, V) for the 3-GEMM compilation. ``value`` is
    the (n_nodes, n_out) node-value matrix to read leaf outputs from
    (pre-aligned to the desired class set)."""
    internal = np.nonzero(tree.feature != LEAF)[0]
    leaves = np.nonzero(tree.feature == LEAF)[0]
    i_pos = {n: k for k, n in enumerate(internal)}
    l_pos = {n: k for k, n in enumerate(leaves)}
    F, I, L = tree.n_features, len(internal), len(leaves)

    A = np.zeros((F, I))
    thr = np.zeros(I)
    for n in internal:
        A[tree.feature[n], i_pos[n]] = 1.0
        thr[i_pos[n]] = tree.threshold[n]

    C = np.zeros((I, L))
    D = np.zeros(L)

    def walk(n: int, path: list[tuple[int, int]]) -> None:
        if tree.feature[n] == LEAF:
            lp = l_pos[n]
            for anc, direction in path:
                C[i_pos[anc], lp] = 1.0 if direction == 0 else -1.0
            D[lp] = sum(1 for _, d in path if d == 0)
            return
        walk(tree.left[n], path + [(n, 0)])
        walk(tree.right[n], path + [(n, 1)])

    walk(0, [])
    V = value[leaves]
    return A, thr, C, D, V


def _aligned_values(tree: DecisionTree, classes: np.ndarray | None) -> np.ndarray:
    """Node-value matrix aligned to ``classes`` (forest members trained
    on a bootstrap may have seen fewer classes)."""
    if classes is None or tree.task != "classification":
        return tree.value
    if len(tree.classes_) == len(classes):
        return tree.value
    full = np.zeros((tree.n_nodes, len(classes)))
    full[:, np.searchsorted(classes, tree.classes_)] = tree.value
    return full


def tree_nodes(
    tree: DecisionTree,
    input_name: str,
    output_name: str,
    prefix: str,
    classes: np.ndarray | None = None,
) -> tuple[list[Node], dict[str, np.ndarray]]:
    """Emit nodes computing ``output_name`` = per-row leaf values
    (B, n_out) of ``tree`` applied to the feature tensor ``input_name``."""
    value = _aligned_values(tree, classes)
    if tree.feature[0] == LEAF:  # single-leaf tree: constant output
        F = max(1, tree.n_features)
        inits = {
            f"{prefix}Z": np.zeros((F, value.shape[1])),
            f"{prefix}V0": value[0],
        }
        nodes = [
            Node("MatMul", [input_name, f"{prefix}Z"], f"{prefix}zero"),
            Node("Add", [f"{prefix}zero", f"{prefix}V0"], output_name),
        ]
        return nodes, inits
    A, thr, C, D, V = _tree_gemm_tensors(tree, value)
    inits = {
        f"{prefix}A": A,
        f"{prefix}thr": thr,
        f"{prefix}C": C,
        f"{prefix}D": D,
        f"{prefix}V": V,
    }
    nodes = [
        Node("MatMul", [input_name, f"{prefix}A"], f"{prefix}s1"),
        Node("LessOrEqual", [f"{prefix}s1", f"{prefix}thr"], f"{prefix}e"),
        Node("Cast", [f"{prefix}e"], f"{prefix}ef", {"to": "float64"}),
        Node("MatMul", [f"{prefix}ef", f"{prefix}C"], f"{prefix}s2"),
        Node("Equal", [f"{prefix}s2", f"{prefix}D"], f"{prefix}l"),
        Node("Cast", [f"{prefix}l"], f"{prefix}lf", {"to": "float64"}),
        Node("MatMul", [f"{prefix}lf", f"{prefix}V"], output_name),
    ]
    return nodes, inits


def tree_to_graph(tree: DecisionTree, input_name: str = "X") -> Graph:
    """Compile a single tree: input (B,F) features → output ``value``
    (leaf probabilities / regression means)."""
    nodes, inits = tree_nodes(tree, input_name, "value", "t0_")
    g = Graph(inputs=[input_name], outputs=["value"], nodes=nodes, initializers=inits,
              name="tree")
    g.validate()
    return g


def forest_to_graph(forest: RandomForest, input_name: str = "X") -> Graph:
    """Compile a forest: per-tree GEMM blocks (with per-tree feature
    Gather), averaged."""
    classes = forest.classes_ if forest.task == "classification" else None
    nodes: list[Node] = []
    inits: dict[str, np.ndarray] = {}
    vals = []
    for i, (tree, cols) in enumerate(zip(forest.trees, forest.feature_subsets)):
        p = f"t{i}_"
        # each tree was trained on its own column subset: gather first
        inits[f"{p}cols"] = np.asarray(cols, dtype=np.int64)
        nodes.append(Node("Gather", [input_name, f"{p}cols"], f"{p}x", {"axis": 1}))
        feat_in = f"{p}x"
        tn, ti = tree_nodes(tree, feat_in, f"{p}val", p, classes=classes)
        nodes.extend(tn)
        inits.update(ti)
        vals.append(f"{p}val")
    acc = vals[0]
    for i, v in enumerate(vals[1:]):
        nodes.append(Node("Add", [acc, v], f"sum{i}"))
        acc = f"sum{i}"
    inits["ntrees"] = np.float64(forest.n_trees)
    nodes.append(Node("Div", [acc, "ntrees"], "value"))
    g = Graph(inputs=[input_name], outputs=["value"], nodes=nodes, initializers=inits,
              name="forest")
    g.validate()
    return g


def linear_to_graph(model, input_name: str = "X") -> Graph:
    """Compile LinearRegression / LogisticRegressionL1. Outputs:
    ``score`` (= Xw + b) and, for logistic, ``proba`` (= sigmoid)."""
    inits = {"W": model.coef_.reshape(-1, 1), "b": np.float64(model.intercept_)}
    nodes = [
        Node("MatMul", [input_name, "W"], "xw"),
        Node("Add", ["xw", "b"], "score2d"),
        Node("Reshape", ["score2d"], "score", {"shape": [-1]}),
    ]
    outputs = ["score"]
    if isinstance(model, LogisticRegressionL1):
        nodes.append(Node("Sigmoid", ["score"], "proba"))
        outputs.append("proba")
    g = Graph(inputs=[input_name], outputs=outputs, nodes=nodes, initializers=inits,
              name="linear")
    g.validate()
    return g


def mlp_to_graph(mlp: MLPClassifier, input_name: str = "X") -> Graph:
    """Compile an MLP: Gemm/Relu chain + sigmoid head."""
    nodes: list[Node] = []
    inits: dict[str, np.ndarray] = {}
    h = input_name
    n_layers = len(mlp.weights)
    for i, (W, b) in enumerate(zip(mlp.weights, mlp.biases)):
        inits[f"W{i}"] = W
        inits[f"b{i}"] = b
        nodes.append(Node("Gemm", [h, f"W{i}", f"b{i}"], f"z{i}"))
        h = f"z{i}"
        if i < n_layers - 1:
            nodes.append(Node("Relu", [h], f"a{i}"))
            h = f"a{i}"
    nodes.append(Node("Reshape", [h], "score", {"shape": [-1]}))
    nodes.append(Node("Sigmoid", ["score"], "proba"))
    g = Graph(inputs=[input_name], outputs=["score", "proba"],
              nodes=nodes, initializers=inits, name="mlp")
    g.validate()
    return g


def featurizer_nodes(
    feat: TableFeaturizer, output_name: str = "features"
) -> tuple[list[str], list[Node], dict[str, np.ndarray]]:
    """Emit the featurizer as graph ops: inputs are the raw ``num``
    block and one int-code tensor per categorical column; output is the
    dense feature matrix (scaled numerics ++ one-hot blocks)."""
    inputs: list[str] = []
    nodes: list[Node] = []
    inits: dict[str, np.ndarray] = {}
    parts: list[str] = []
    if feat.numeric_cols:
        inputs.append("num")
        if feat.scaler is not None:
            inits["f_mean"] = feat.scaler.mean_
            inits["f_scale"] = feat.scaler.scale_
            nodes.append(Node("Sub", ["num", "f_mean"], "f_centered"))
            nodes.append(Node("Div", ["f_centered", "f_scale"], "f_num"))
            parts.append("f_num")
        else:
            parts.append("num")
    for c in feat.categorical_cols:
        inp = f"cat_{c}"
        inputs.append(inp)
        depth = len(feat.encoders[c].categories_)
        nodes.append(Node("OneHot", [inp], f"f_oh_{c}", {"depth": depth}))
        parts.append(f"f_oh_{c}")
    if len(parts) == 1:
        nodes.append(Node("Identity", [parts[0]], output_name))
    else:
        nodes.append(Node("Concat", parts, output_name, {"axis": 1}))
    return inputs, nodes, inits


def pipeline_to_graph(pipe: Pipeline) -> Graph:
    """Compile featurizer + estimator end-to-end (the Fig. 3 pipelines).
    Feed with ``TableFeaturizer.transform_codes`` outputs."""
    inputs, nodes, inits = featurizer_nodes(pipe.featurizer, "features")
    model = pipe.model
    if isinstance(model, DecisionTree):
        sub = tree_to_graph(model, "features")
    elif isinstance(model, RandomForest):
        sub = forest_to_graph(model, "features")
    elif isinstance(model, (LogisticRegressionL1, LinearRegression)):
        sub = linear_to_graph(model, "features")
    elif isinstance(model, MLPClassifier):
        sub = mlp_to_graph(model, "features")
    else:
        raise TypeError(f"cannot NN-translate {type(model).__name__}")
    nodes.extend(sub.nodes)
    inits.update(sub.initializers)
    g = Graph(inputs=inputs, outputs=list(sub.outputs), nodes=nodes,
              initializers=inits, name="pipeline")
    g.validate()
    return g
