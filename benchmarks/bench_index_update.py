"""Figs. 21/22 benchmark: batch insert/update (beta=100) per index.

Full beta sweep: ``jobs/fig21_22_update.py``.
"""
import numpy as np
import pytest

from repro.experiments import INDEX_BUILDERS
from benchmarks.conftest import F, THETA

BETA = 100


@pytest.fixture(scope="module")
def update_payload(build_wb):
    union = build_wb.union(THETA)
    g = np.random.default_rng(31)
    cells_list = list(union.values())
    new = [
        (10_000_000 + i, cells_list[g.integers(0, len(cells_list))]) for i in range(BETA)
    ]
    upd = [
        (int(d), cells_list[g.integers(0, len(cells_list))])
        for d in g.choice(sorted(union), BETA, replace=True)
    ]
    return union, new, upd


@pytest.mark.parametrize("method", list(INDEX_BUILDERS))
def test_insert_batch(benchmark, update_payload, method):
    union, new, _upd = update_payload
    idx = INDEX_BUILDERS[method](dict(union), THETA, F)
    benchmark.pedantic(
        lambda: [idx.insert(d, c) for d, c in new], rounds=1, iterations=1
    )


@pytest.mark.parametrize("method", list(INDEX_BUILDERS))
def test_update_batch(benchmark, update_payload, method):
    union, _new, upd = update_payload
    idx = INDEX_BUILDERS[method](dict(union), THETA, F)
    benchmark.pedantic(
        lambda: [idx.update(d, c) for d, c in upd], rounds=1, iterations=1
    )
