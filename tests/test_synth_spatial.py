"""Synthetic multi-source generator (the Table I substitute)."""
import numpy as np
import pandas as pd
import pytest

from repro.synth_spatial import (
    SOURCE_SPECS,
    generate_corpus_pdf,
    generate_source_pdf,
    pick_queries,
    source_statistics,
)


class TestSpecs:
    def test_five_sources(self):
        assert [s.name for s in SOURCE_SPECS] == ["baidu", "btaa", "nyu", "transit", "umn"]

    def test_dataset_count_ratios_match_table1(self):
        # Table I: baidu 6581, btaa 3204, nyu 1093, transit 1967, umn 5453.
        counts = {s.name: s.n_datasets for s in SOURCE_SPECS}
        assert counts["baidu"] == 6581 and counts["umn"] == 5453
        assert counts["baidu"] > counts["umn"] > counts["btaa"] > counts["transit"] > counts["nyu"]

    def test_transit_bbox_is_dc_maryland(self):
        t = next(s for s in SOURCE_SPECS if s.name == "transit")
        assert t.bbox.x0 == pytest.approx(-77.73) and t.bbox.y1 == pytest.approx(39.78)


class TestGeneration:
    @pytest.mark.parametrize("i,spec", list(enumerate(SOURCE_SPECS)))
    def test_points_within_bbox(self, i, spec):
        pdf = generate_source_pdf(spec, scale=0.003, seed=3, source_index=i)
        assert pdf["x"].between(spec.bbox.x0, spec.bbox.x1).all()
        assert pdf["y"].between(spec.bbox.y0, spec.bbox.y1).all()

    def test_deterministic(self):
        a = generate_corpus_pdf(scale=0.003, seed=5)
        b = generate_corpus_pdf(scale=0.003, seed=5)
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_data(self):
        a = generate_corpus_pdf(scale=0.003, seed=5)
        b = generate_corpus_pdf(scale=0.003, seed=6)
        assert not a.equals(b)

    def test_scale_controls_dataset_count(self):
        small = generate_corpus_pdf(scale=0.002)
        large = generate_corpus_pdf(scale=0.01)
        assert large["dataset_id"].nunique() > small["dataset_id"].nunique()

    def test_dataset_ids_unique_across_sources(self, points_pdf):
        per_source = points_pdf.groupby("source_id")["dataset_id"].unique()
        all_ids = np.concatenate(list(per_source))
        assert len(all_ids) == len(set(all_ids))

    def test_max_points_cap(self):
        pdf = generate_corpus_pdf(scale=0.003, max_points_per_dataset=50)
        assert pdf.groupby("dataset_id").size().max() <= 50

    def test_schema(self, points_pdf):
        assert list(points_pdf.columns) == ["source_id", "dataset_id", "x", "y"]


class TestQueriesAndStats:
    def test_pick_queries_deterministic(self, points_pdf):
        assert pick_queries(points_pdf, 5) == pick_queries(points_pdf, 5)

    def test_pick_queries_are_corpus_datasets(self, points_pdf):
        ids = set(points_pdf["dataset_id"].unique())
        assert set(pick_queries(points_pdf, 10)).issubset(ids)

    def test_pick_queries_count(self, points_pdf):
        assert len(pick_queries(points_pdf, 7)) == 7

    def test_statistics_table(self, points_pdf):
        stats = source_statistics(points_pdf)
        assert list(stats["source"]) == ["baidu", "btaa", "nyu", "transit", "umn"]
        assert (stats["n_datasets"] > 0).all()
        assert stats["n_points"].sum() == len(points_pdf)
