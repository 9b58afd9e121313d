"""On-disk model format: a directory with ``graph.json`` (structure)
and ``tensors.npz`` (initializer weights).

This is the "model file" the DB stores; loading one (`load_graph`) is
the cold-start cost that standalone ORT pays per run in Fig. 3, and
that the in-DB session cache amortizes away.
"""
from __future__ import annotations

import json
import os

import numpy as np

from repro.onnxlite.graph import Graph, Node

_FORMAT_VERSION = 1


def save_graph(g: Graph, path: str) -> str:
    """Write ``g`` under directory ``path`` (created if missing)."""
    os.makedirs(path, exist_ok=True)
    meta = {
        "format_version": _FORMAT_VERSION,
        "name": g.name,
        "inputs": g.inputs,
        "outputs": g.outputs,
        "nodes": [
            {"op_type": n.op_type, "inputs": n.inputs, "output": n.output, "attrs": n.attrs}
            for n in g.nodes
        ],
    }
    with open(os.path.join(path, "graph.json"), "w") as f:
        json.dump(meta, f)
    np.savez(os.path.join(path, "tensors.npz"), **g.initializers)
    return path


def load_graph(path: str) -> Graph:
    """Read a model directory back into a :class:`Graph`."""
    with open(os.path.join(path, "graph.json")) as f:
        meta = json.load(f)
    if meta.get("format_version") != _FORMAT_VERSION:
        raise ValueError(f"unsupported model format: {meta.get('format_version')}")
    with np.load(os.path.join(path, "tensors.npz")) as z:
        inits = {k: z[k] for k in z.files}
    return Graph(
        inputs=list(meta["inputs"]),
        outputs=list(meta["outputs"]),
        nodes=[
            Node(
                op_type=n["op_type"],
                inputs=list(n["inputs"]),
                output=n["output"],
                attrs=dict(n["attrs"]),
            )
            for n in meta["nodes"]
        ],
        initializers=inits,
        name=meta.get("name", "graph"),
    )
