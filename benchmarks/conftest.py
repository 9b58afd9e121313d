"""Benchmark-local fixtures: trained artifacts shared across benchmark
tests (session-scoped so nothing is retrained per test)."""
import pytest

from repro.datasets import flights, hospital
from repro.experiments.common import (
    flights_forest_pipeline,
    flights_lr_pipeline,
    hospital_forest_pipeline,
    hospital_tree_pipeline,
)

# benchmark scale: ~SF 0.1 band (≤200K rows per input)
BENCH_ROWS = 200_000


@pytest.fixture(scope="session")
def hosp_frame():
    return hospital.joined_frame(BENCH_ROWS, seed=101, with_label=False)


@pytest.fixture(scope="session")
def fl_frame():
    return flights.frame(BENCH_ROWS, seed=102)


@pytest.fixture(scope="session")
def hosp_tree():
    return hospital_tree_pipeline(n_train=20_000, seed=0)


@pytest.fixture(scope="session")
def hosp_forest():
    return hospital_forest_pipeline(n_train=20_000, seed=0)


@pytest.fixture(scope="session")
def fl_lr_dense():
    return flights_lr_pipeline(n_train=50_000, alpha=0.0, seed=0)


@pytest.fixture(scope="session")
def fl_forest():
    return flights_forest_pipeline(n_train=50_000, seed=0)
