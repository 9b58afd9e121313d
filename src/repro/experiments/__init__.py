"""Experiment harnesses, one per reproduced table (T1–T8).

Each module exposes ``run(spark=None, **params) -> list[dict]`` (the
table rows) so that ``jobs/`` (full paper-scale sweeps, printed as
markdown for EXPERIMENTS.md) and ``benchmarks/`` (pytest-benchmark
regression points at reduced scale) share one implementation.
"""
