"""Synthetic stand-ins for the paper's two evaluation datasets.

* ``hospital`` — the running example's patient data (Microsoft's
  hospital length-of-stay sample): patient_info / blood_tests /
  prenatal_tests star schema, label = length of stay in days.
* ``flights`` — the Kaggle flight-delays dataset: categorical airports
  and carriers (wide one-hot blocks), label = delayed.

Both are deterministic in ``seed`` and have *planted* signal so trained
models exhibit the structure the paper's optimizations exploit
(pregnancy-dependent stay length for tree pruning; mostly-irrelevant
airports for L1 sparsity).
"""
from repro.datasets import flights, hospital

__all__ = ["hospital", "flights"]
