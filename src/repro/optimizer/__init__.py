"""Raven's Cross Optimizer (§4): cross-IR optimizations and operator
transformations, expressed as rewrite rules over the unified IR.

Rule inventory (module → paper optimization):

* ``relational`` — standard DB optimizations: filter pushdown/merging,
  projection pushdown, join elimination (§2 "standard DB optimizations").
* ``pruning`` — predicate-based model pruning: tree-branch elimination
  and one-hot block folding from WHERE-clause constraints (§4.1).
* ``projection`` — model-projection pushdown: zero-weight / unused
  features are dropped from model *and* data plan (§4.1).
* ``clustering`` — model clustering: per-cluster precompiled models
  behind a cheap router (§4.1).
* ``inlining`` — model inlining: trees and linear models become SQL
  expressions executed by the relational engine (§4.2).
* ``nn_translate`` — NN translation: classical pipelines become
  onnxlite graphs (§4.2).
* ``splitting`` — model/query splitting: a tree's root split becomes a
  UNION of two cheaper inference branches (§2).

``rules.CrossOptimizer`` applies rules heuristically in a fixed order
(the paper's "initial version will be heuristic-based, applying all
rules in a specific order").
"""
from repro.optimizer.rules import CrossOptimizer, OptimizationReport, Rule, default_rules

__all__ = ["CrossOptimizer", "OptimizationReport", "Rule", "default_rules"]
