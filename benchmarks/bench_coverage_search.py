"""Figs. 15-18 benchmark: CJSP batch (q=10 queries, k=10, delta=5) per method.

Full k/theta/q/delta sweeps: ``jobs/fig15_18_coverage.py``.
"""
import pytest

from benchmarks.conftest import THETA


@pytest.mark.parametrize("method", ["CoverageSearch", "SG+DITS", "SG"])
def test_coverage_batch(benchmark, cov_wb, coverage_searchers, method):
    union = cov_wb.union(THETA)
    qids = cov_wb.queries(10)
    search = coverage_searchers[method]

    def run():
        for qid in qids:
            search(union[qid], 5, 10, frozenset([qid]))

    benchmark.pedantic(run, rounds=1, iterations=1)
