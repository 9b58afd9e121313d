"""API knowledge base for the Python static analyzer.

The paper's Static Analyzer consumes "an in-house knowledge base of
APIs of popular data science libraries ... along with functions that
map dataflow nodes/subgraphs to equivalent IR operators". This module
is that KB: a registry of recognizable call/subscript patterns and the
IR operator category each maps to. ``py_analyzer`` consults it; code
matching nothing here falls back to a UDF operator.
"""
from __future__ import annotations

# method name -> (IR category, handler key). Handlers live in
# py_analyzer; the KB records what is *mappable* and how.
SUPPORTED_METHODS: dict[str, tuple[str, str]] = {
    "merge": ("RA", "join"),          # pandas df.merge(other, on=...)
    "predict": ("MLD", "predict"),    # model.predict(X)
    "predict_proba": ("MLD", "predict_proba"),
    "decision_function": ("MLD", "predict_score"),
}

# subscript patterns (df[...]):
#   boolean mask  df[df["c"] > 3]  -> RA Filter
#   column list   df[["a","b"]]    -> RA Project
SUPPORTED_SUBSCRIPTS = {"mask_filter": "RA", "column_project": "RA"}

# python statements using these constructs cannot be translated to
# RA/LA/MLD operators by straight-line analysis (§3.2: ~17% of notebook
# cells); they trigger the UDF fallback.
UNSUPPORTED_CONSTRUCTS = {"For", "While", "ListComp", "SetComp", "DictComp",
                          "GeneratorExp", "Lambda", "Try", "With"}
