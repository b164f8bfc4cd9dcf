"""Benchmark fixtures: one workbench + prebuilt indexes per table family.

Benchmarks time *representative cells* of each paper table (default
parameters, every method) with pytest-benchmark; the full parameter sweeps
that regenerate the complete tables live in ``jobs/`` (they take minutes).
All timing cells run ``benchmark.pedantic(rounds=1)`` — the workloads are
deterministic batch runs, not microsecond kernels, so calibration rounds
would only burn the time budget.
"""
from __future__ import annotations

import pytest

from repro.experiments import Workbench, make_coverage_searchers, make_overlap_searchers
from repro.core.framework import make_center
from repro.synth_spatial import SPACE

SEARCH_WB = dict(scale=0.1, cap=1500, seed=7)
BUILD_WB = dict(scale=0.05, cap=400, seed=7)
COMM_WB = dict(scale=0.02, cap=300, seed=7)
COV_WB = dict(scale=0.012, cap=200, seed=7)

THETA = 12
F = 10


@pytest.fixture(scope="session")
def search_wb():
    return Workbench.make(**{"scale": SEARCH_WB["scale"], "cap": SEARCH_WB["cap"], "seed": SEARCH_WB["seed"]})


@pytest.fixture(scope="session")
def build_wb():
    return Workbench.make(**{"scale": BUILD_WB["scale"], "cap": BUILD_WB["cap"], "seed": BUILD_WB["seed"]})


@pytest.fixture(scope="session")
def comm_wb():
    return Workbench.make(**{"scale": COMM_WB["scale"], "cap": COMM_WB["cap"], "seed": COMM_WB["seed"]})


@pytest.fixture(scope="session")
def cov_wb():
    return Workbench.make(**{"scale": COV_WB["scale"], "cap": COV_WB["cap"], "seed": COV_WB["seed"]})


@pytest.fixture(scope="session")
def overlap_searchers(search_wb):
    return make_overlap_searchers(search_wb.union(THETA), THETA, F)


@pytest.fixture(scope="session")
def coverage_searchers(cov_wb):
    return make_coverage_searchers(cov_wb.union(THETA), THETA, F)


@pytest.fixture(scope="session")
def comm_center(comm_wb):
    return make_center(comm_wb.corpus(THETA), THETA, F, SPACE)


@pytest.fixture(scope="session")
def cov_center(cov_wb):
    return make_center(cov_wb.corpus(THETA), THETA, F, SPACE)
