"""Operator nodes of the Raven IR.

Relational nodes (Scan/Filter/Project/Join/Union) mirror a textbook
logical plan. ML nodes carry the actual model artifacts so optimizer
rules can rewrite them (prune a tree, slice a weight vector, fold a
one-hot block): that is the whole point of a *unified* IR — the
optimizer sees model internals and data operators in one DAG.

Every predict-style node implements ``predict_pandas(pdf) -> np.ndarray``
— the single place its semantics live. The Spark codegen wraps it in
``mapInPandas``; tests call it directly; the per-tuple baseline loops it.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.ir.expr import Expr


@dataclass(repr=False)
class SqlExpr(Expr):
    """A raw SQL scalar expression (used for inlined models). Tracks the
    columns it references so pushdown rules stay correct."""

    sql: str
    cols: set[str] = field(default_factory=set)

    def columns(self) -> set[str]:
        return set(self.cols)

    def to_sql(self) -> str:
        return self.sql


class PlanNode:
    """Base class; subclasses define ``children`` ordering."""

    children: list["PlanNode"]

    def with_children(self, children: list["PlanNode"]) -> "PlanNode":
        """Shallow copy with replaced children (used by plan rewrites)."""
        import copy

        node = copy.copy(self)
        node.children = list(children)
        return node

    def label(self) -> str:
        return type(self).__name__


@dataclass(eq=False)
class Scan(PlanNode):
    table: str
    children: list[PlanNode] = field(default_factory=list)

    def label(self) -> str:
        return f"Scan({self.table})"


@dataclass(eq=False)
class Filter(PlanNode):
    child: PlanNode
    predicate: Expr

    @property
    def children(self) -> list[PlanNode]:
        return [self.child]

    @children.setter
    def children(self, cs: list[PlanNode]) -> None:
        (self.child,) = cs

    def label(self) -> str:
        return f"Filter({self.predicate.to_sql()})"


@dataclass(eq=False)
class Project(PlanNode):
    """Projection with optional computed columns: ``exprs`` maps output
    name → expression (a bare ``Col`` for passthrough)."""

    child: PlanNode
    exprs: list[tuple[str, Expr]]

    @property
    def children(self) -> list[PlanNode]:
        return [self.child]

    @children.setter
    def children(self, cs: list[PlanNode]) -> None:
        (self.child,) = cs

    @property
    def output_names(self) -> list[str]:
        return [n for n, _ in self.exprs]

    def label(self) -> str:
        return f"Project({', '.join(self.output_names)})"


@dataclass(eq=False)
class Join(PlanNode):
    left: PlanNode
    right: PlanNode
    left_on: str
    right_on: str
    how: str = "inner"
    # right side is unique on its key AND every left row matches exactly
    # one right row (key/FK integrity): dropping the join is then
    # row-preserving. Set from catalog metadata by the analyzer.
    fk_one_to_one: bool = False

    @property
    def children(self) -> list[PlanNode]:
        return [self.left, self.right]

    @children.setter
    def children(self, cs: list[PlanNode]) -> None:
        self.left, self.right = cs

    def label(self) -> str:
        return f"Join({self.left_on}={self.right_on}{', 1:1' if self.fk_one_to_one else ''})"


@dataclass(eq=False)
class Union(PlanNode):
    """Bag UNION ALL of same-schema children (model/query splitting)."""

    children: list[PlanNode]

    def label(self) -> str:
        return f"Union({len(self.children)})"


def _series(values: np.ndarray, name: str) -> pd.DataFrame:
    return pd.DataFrame({name: values})


@dataclass(eq=False)
class MLPredict(PlanNode):
    """Classical-ML scoring (MLD operator): a miniml ``Pipeline``
    applied to the child's rows, appending column ``output_col``.

    ``kind`` selects what to emit: ``label`` (predicted class /
    regression value), ``proba`` (P[class 1]) or ``score`` (margin).
    """

    child: PlanNode
    model_name: str
    pipeline: object  # miniml.Pipeline
    output_col: str
    kind: str = "label"

    @property
    def children(self) -> list[PlanNode]:
        return [self.child]

    @children.setter
    def children(self, cs: list[PlanNode]) -> None:
        (self.child,) = cs

    @property
    def input_cols(self) -> list[str]:
        return list(self.pipeline.input_cols)

    def predict_pandas(self, pdf: pd.DataFrame) -> np.ndarray:
        if self.kind == "label":
            return np.asarray(self.pipeline.predict(pdf), dtype=np.float64)
        if self.kind == "proba":
            return self.pipeline.predict_proba(pdf)[:, 1]
        if self.kind == "score":
            return np.asarray(self.pipeline.decision_function(pdf), dtype=np.float64)
        raise ValueError(f"bad kind {self.kind!r}")

    def label(self) -> str:
        return f"MLPredict({self.model_name}→{self.output_col})"


@dataclass(eq=False)
class NNPredict(PlanNode):
    """LA-operator scoring: an onnxlite graph fed through the
    featurizer's code/numeric inputs (NN-translated pipeline)."""

    child: PlanNode
    model_name: str
    graph: object  # onnxlite.Graph
    featurizer: object  # miniml.TableFeaturizer (for transform_codes)
    output_col: str
    kind: str = "label"
    classes: np.ndarray | None = None  # for label output of tree/forest graphs

    @property
    def children(self) -> list[PlanNode]:
        return [self.child]

    @children.setter
    def children(self, cs: list[PlanNode]) -> None:
        (self.child,) = cs

    @property
    def input_cols(self) -> list[str]:
        return list(self.featurizer.input_cols)

    def predict_pandas(self, pdf: pd.DataFrame) -> np.ndarray:
        out = self.graph.run(self.featurizer.transform_codes(pdf))
        if "value" in out:  # tree/forest value matrix
            v = out["value"]
            if self.kind == "label":
                if self.classes is not None:
                    return np.asarray(self.classes, dtype=np.float64)[
                        np.argmax(v, axis=1)
                    ]
                return v[:, 0]
            if self.kind == "proba":
                return v[:, 1]
            raise ValueError(f"kind {self.kind!r} unsupported for value graphs")
        if self.kind == "proba":
            return out["proba"]
        if self.kind == "score":
            return out["score"]
        if self.kind == "label":
            return (out["score"] > 0).astype(np.float64)
        raise ValueError(f"bad kind {self.kind!r}")

    def label(self) -> str:
        return f"NNPredict({self.model_name}→{self.output_col})"


@dataclass(eq=False)
class ClusteredPredict(PlanNode):
    """Model-clustering execution: route each row to its (offline
    k-means) cluster and score with that cluster's precompiled model."""

    child: PlanNode
    model_name: str
    router: object  # callable: pdf -> cluster ids (np.ndarray int)
    cluster_pipelines: list  # per-cluster miniml.Pipeline
    output_col: str
    kind: str = "proba"

    @property
    def children(self) -> list[PlanNode]:
        return [self.child]

    @children.setter
    def children(self, cs: list[PlanNode]) -> None:
        (self.child,) = cs

    @property
    def input_cols(self) -> list[str]:
        cols: list[str] = []
        for p in self.cluster_pipelines:
            for c in p.input_cols:
                if c not in cols:
                    cols.append(c)
        return cols

    def predict_pandas(self, pdf: pd.DataFrame) -> np.ndarray:
        cids = np.asarray(self.router(pdf))
        out = np.empty(len(pdf), dtype=np.float64)
        for cid in np.unique(cids):
            mask = cids == cid
            sub = pdf.loc[mask]
            pipe = self.cluster_pipelines[int(cid)]
            if self.kind == "proba":
                out[mask] = pipe.predict_proba(sub)[:, 1]
            elif self.kind == "score":
                out[mask] = pipe.decision_function(sub)
            else:
                out[mask] = np.asarray(pipe.predict(sub), dtype=np.float64)
        return out

    def label(self) -> str:
        return f"ClusteredPredict({self.model_name}×{len(self.cluster_pipelines)})"


@dataclass(eq=False)
class UDFNode(PlanNode):
    """Black-box Python over pandas batches: ``fn(pdf) -> pdf``. The
    static analyzer emits this for code it cannot map to IR operators."""

    child: PlanNode
    fn: object
    description: str = "udf"
    # columns the UDF reads; None = unknown → treat as "all" (blocks pushdown)
    required_cols: list[str] | None = None

    @property
    def children(self) -> list[PlanNode]:
        return [self.child]

    @children.setter
    def children(self, cs: list[PlanNode]) -> None:
        (self.child,) = cs

    def label(self) -> str:
        return f"UDF({self.description})"
