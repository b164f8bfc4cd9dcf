"""Distributed dataflow operators == driver-side algorithms, oracle-checked."""
import numpy as np
import pandas as pd
import pytest

from repro import spark_ops
from repro.baselines.greedy import SGCoverage
from repro.cells import cell_sets_df
from repro.core.overlap import brute_force_topk, query_node_from_cells
from repro.oracle import assert_equivalent
from repro.synth_spatial import SPACE
from tests.conftest import F, THETA


@pytest.fixture(scope="module")
def cells_sdf(spark, points_pdf):
    return cell_sets_df(spark.createDataFrame(points_pdf), SPACE, THETA).cache()


@pytest.fixture(scope="module")
def dist_index(tmp_path_factory, cells_sdf):
    out = tmp_path_factory.mktemp("dits")
    return spark_ops.build_distributed_index(cells_sdf, SPACE, THETA, F, str(out))


class TestOverlapTopkSql:
    def test_equals_brute_force(self, spark, cells_sdf, union_datasets, query_ids):
        for qid in query_ids[:4]:
            q = union_datasets[qid]
            qdf = spark.createDataFrame(pd.DataFrame({"cell": q}))
            top = spark_ops.overlap_topk_sql(spark, qdf, cells_sdf, 10, (qid,))
            got = [(int(r["dataset_id"]), int(r["overlap"])) for r in top.collect()]
            assert got == brute_force_topk(q, union_datasets, 10, frozenset([qid]))

    def test_oracle(self, spark, cells_sdf, union_datasets, query_ids):
        qid = query_ids[0]
        q = union_datasets[qid]
        qdf = spark.createDataFrame(pd.DataFrame({"cell": q}))
        top = spark_ops.overlap_topk_sql(spark, qdf, cells_sdf, 10, (qid,)).select(
            "dataset_id", "overlap"
        )
        assert_equivalent(
            top,
            f"""SELECT dataset_id, COUNT(DISTINCT c.cell) AS overlap
                FROM corpus c JOIN q ON c.cell = q.cell
                WHERE dataset_id <> {qid}
                GROUP BY dataset_id
                ORDER BY overlap DESC, dataset_id ASC LIMIT 10""",
            corpus=cells_sdf.toPandas(),
            q=pd.DataFrame({"cell": q}),
        )

    def test_no_exclusion(self, spark, cells_sdf, union_datasets, query_ids):
        qid = query_ids[1]
        q = union_datasets[qid]
        qdf = spark.createDataFrame(pd.DataFrame({"cell": q}))
        top = spark_ops.overlap_topk_sql(spark, qdf, cells_sdf, 5)
        got = [(int(r["dataset_id"]), int(r["overlap"])) for r in top.collect()]
        assert got == brute_force_topk(q, union_datasets, 5)


class TestDistributedBuild:
    def test_summaries_cover_sources(self, dist_index, corpus):
        _groot, summaries, paths = dist_index
        assert set(summaries) == set(corpus)
        assert set(paths) == set(corpus)
        for name, s in summaries.items():
            assert s.n_datasets == len(corpus[name])

    def test_persisted_indexes_load_and_match(self, dist_index, corpus):
        _groot, _summaries, paths = dist_index
        for name, path in paths.items():
            idx = spark_ops._load_index(path)
            assert sorted(idx.datasets) == sorted(corpus[name])

    def test_summary_rects_match_driver_side(self, dist_index, center):
        _groot, summaries, _paths = dist_index
        for name, s in summaries.items():
            expect = center.summaries[name]
            assert np.allclose(s.rect, expect.rect)


class TestDistributedSearch:
    def test_overlap_equals_brute_force(
        self, spark, dist_index, union_datasets, query_ids
    ):
        groot, summaries, paths = dist_index
        for qid in query_ids[:4]:
            q = union_datasets[qid]
            res = spark_ops.distributed_overlap_search(
                spark, groot, summaries, paths, q, 10, SPACE, THETA, (qid,)
            )
            assert res == brute_force_topk(q, union_datasets, 10, frozenset([qid]))

    @pytest.mark.parametrize("delta", [0, 5])
    def test_coverage_equals_driver_sg(
        self, spark, dist_index, union_datasets, query_ids, delta
    ):
        groot, summaries, paths = dist_index
        qid = query_ids[2]
        q = union_datasets[qid]
        ref = SGCoverage(union_datasets, THETA).search(
            query_node_from_cells(q, THETA), delta, 8, frozenset([qid])
        )
        got = spark_ops.distributed_coverage_search(
            spark, groot, summaries, paths, q, delta, 8, SPACE, THETA, (qid,)
        )
        assert got == ref

    def test_query_outside_all_sources(self, spark, dist_index):
        groot, summaries, paths = dist_index
        # A cell in the far south Pacific where no synthetic source lives.
        from repro.grid import cell_ids_np

        q = cell_ids_np(np.array([-140.0]), np.array([-60.0]), SPACE, THETA)
        res = spark_ops.distributed_overlap_search(
            spark, groot, summaries, paths, q, 10, SPACE, THETA
        )
        assert res == []
