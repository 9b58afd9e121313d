"""Inference-query execution (§5): IR→Spark code generation, the model
store, and the three execution modes of Fig. 3 (in-process, standalone
engine, out-of-process external runtime)."""
from repro.runtime.codegen import to_dataframe
from repro.runtime.model_store import ModelStore
from repro.runtime.timing import force, measure

__all__ = ["to_dataframe", "ModelStore", "force", "measure"]
