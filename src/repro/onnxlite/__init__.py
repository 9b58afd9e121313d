"""onnxlite — a from-scratch tensor dataflow engine standing in for
ONNX Runtime.

The paper integrates ONNX Runtime into SQL Server and relies on three of
its properties, all implemented here:

* a *graph* of linear-algebra operators executed over batches
  (``graph``/``ops``) — the target of the paper's NN-translation rule;
* a *graph optimizer* with constant folding and dead-node elimination
  (``optimizer``) — the paper's "compiler optimizations";
* *inference sessions* loaded from an on-disk model format, cacheable
  across queries (``serialize``/``session``) — what makes warm in-DB
  scoring fast at small batch sizes (Fig. 3).

``convert`` compiles miniml pipelines (trees, forests, linear models,
MLPs, featurizers) into graphs — the paper's MLD→LA transformation.
"""
from repro.onnxlite.graph import Graph, Node
from repro.onnxlite.optimizer import optimize
from repro.onnxlite.serialize import load_graph, save_graph
from repro.onnxlite.session import InferenceSession, clear_session_cache, get_cached_session

__all__ = [
    "Graph",
    "Node",
    "optimize",
    "save_graph",
    "load_graph",
    "InferenceSession",
    "get_cached_session",
    "clear_session_cache",
]
