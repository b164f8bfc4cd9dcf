"""Figs. 19/20 benchmark: CJSP communication at q=10, all three strategies.

Byte/transfer-time tables: ``jobs/fig19_20_coverage_comm.py``. The
assertion pins the paper's ordering CoverageSearch <= SG+DITS <= SG.
"""
import pytest

from benchmarks.conftest import THETA


@pytest.mark.parametrize("strategy", ["merge", "sg_dits", "sg"])
def test_coverage_comm(benchmark, cov_wb, cov_center, strategy):
    union = cov_wb.union(THETA)
    qids = cov_wb.queries(10)

    def run():
        total = 0
        for qid in qids:
            _, comm = cov_center.coverage_search(
                union[qid], 5, 10, frozenset([qid]), strategy=strategy
            )
            total += comm.total_bytes
        return total

    total = benchmark.pedantic(run, rounds=1, iterations=1)
    assert total > 0
