"""Figs. 13/14 benchmark: OJSP communication bytes at q=10.

pytest-benchmark times the protocol run; the byte/transfer-time tables come
from ``jobs/fig13_14_overlap_comm.py``. The assertion pins the paper's
qualitative result: the distribution strategies transfer fewer bytes.
"""
from benchmarks.conftest import THETA


def test_overlap_comm_strategies(benchmark, comm_wb, comm_center):
    union = comm_wb.union(THETA)
    qids = comm_wb.queries(10)

    def run():
        smart = naive = 0
        for qid in qids:
            _, c1 = comm_center.overlap_search(union[qid], 10, frozenset([qid]))
            _, c2 = comm_center.overlap_search(
                union[qid], 10, frozenset([qid]), use_global=False, clip=False
            )
            smart += c1.total_bytes
            naive += c2.total_bytes
        return smart, naive

    smart, naive = benchmark.pedantic(run, rounds=1, iterations=1)
    assert smart < naive
