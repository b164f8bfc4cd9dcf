"""MBR geometry and the Def.-6 / Lemma-4 distance machinery."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.geometry import (
    cell_coords,
    mbr_intersects,
    mbr_of_coords,
    mbr_union,
    min_cell_distance,
    node_distance_bounds,
    pivot_of_mbr,
    radius_of_mbr,
)
from repro.grid import z_encode_np
from repro.core.node import DatasetNode


def _brute_min_dist(a, b):
    best = np.inf
    for p in a:
        for q in b:
            best = min(best, float(np.hypot(p[0] - q[0], p[1] - q[1])))
    return best


class TestMbr:
    def test_mbr_of_coords(self):
        c = np.array([[1.0, 5.0], [3.0, 2.0], [2.0, 9.0]])
        assert mbr_of_coords(c).tolist() == [1.0, 2.0, 3.0, 9.0]

    def test_union(self):
        a = np.array([0.0, 0.0, 2.0, 2.0])
        b = np.array([1.0, -1.0, 5.0, 1.0])
        assert mbr_union(a, b).tolist() == [0.0, -1.0, 5.0, 2.0]

    @pytest.mark.parametrize(
        "b,expected",
        [
            (np.array([3.0, 3.0, 4.0, 4.0]), False),
            (np.array([2.0, 2.0, 4.0, 4.0]), True),  # shared corner
            (np.array([1.0, 1.0, 1.5, 1.5]), True),  # contained
            (np.array([-1.0, 0.5, 0.0, 1.0]), True),  # shared edge
        ],
    )
    def test_intersects(self, b, expected):
        a = np.array([0.0, 0.0, 2.0, 2.0])
        assert mbr_intersects(a, b) is expected
        assert mbr_intersects(b, a) is expected

    def test_pivot_and_radius(self):
        r = np.array([0.0, 0.0, 6.0, 8.0])
        assert pivot_of_mbr(r).tolist() == [3.0, 4.0]
        assert radius_of_mbr(r) == pytest.approx(5.0)

    def test_point_mbr_zero_radius(self):
        r = np.array([2.0, 3.0, 2.0, 3.0])
        assert radius_of_mbr(r) == 0.0


class TestMinCellDistance:
    def test_paper_example3(self):
        # Example 3: dist(S_D1,S_D2)=1, dist(S_D1,S_D3)=1, dist(S_D2,S_D3)=sqrt(2)
        d1 = cell_coords(np.array([9, 11]), 2)
        d2 = cell_coords(np.array([1, 3]), 2)
        d3 = cell_coords(np.array([12, 13]), 2)
        assert min_cell_distance(d1, d2) == pytest.approx(1.0)
        assert min_cell_distance(d1, d3) == pytest.approx(1.0)
        assert min_cell_distance(d2, d3) == pytest.approx(np.sqrt(2))

    def test_overlapping_sets_zero(self):
        a = cell_coords(np.array([5, 9]), 3)
        b = cell_coords(np.array([9, 40]), 3)
        assert min_cell_distance(a, b) == 0.0

    def test_empty_is_inf(self):
        a = cell_coords(np.array([1]), 3)
        assert min_cell_distance(a, np.empty((0, 2))) == np.inf
        assert min_cell_distance(np.empty((0, 2)), a) == np.inf

    @pytest.mark.parametrize("seed", range(6))
    def test_matches_brute_force(self, seed):
        g = np.random.default_rng(seed)
        a = g.uniform(0, 100, (37, 2))
        b = g.uniform(50, 150, (23, 2))
        assert min_cell_distance(a, b) == pytest.approx(_brute_min_dist(a, b))

    def test_chunked_path(self):
        g = np.random.default_rng(7)
        a = g.uniform(0, 10, (9000, 2))
        b = g.uniform(20, 30, (11, 2))
        assert min_cell_distance(a, b, chunk=1024) == pytest.approx(
            min_cell_distance(a, b, chunk=10**9)
        )


class TestLemma4Bounds:
    def test_paper_example6_shape(self):
        # lb <= dist <= ub with strictly informative bounds on a toy case.
        q = DatasetNode(-1, np.array([0]), 4)
        d = DatasetNode(1, np.array([z_encode_np(np.array([5]), np.array([0]), 4)[0]]), 4)
        lb, ub = node_distance_bounds(q.o, q.r, d.o, d.r)
        exact = min_cell_distance(q.coords, d.coords)
        assert lb <= exact <= ub

    @given(seed=st.integers(0, 10_000))
    @settings(max_examples=80, deadline=None)
    def test_bounds_always_valid(self, seed):
        g = np.random.default_rng(seed)
        theta = 6
        n = 1 << theta
        ca = np.unique(z_encode_np(g.integers(0, n, 12), g.integers(0, n, 12), theta))
        cb = np.unique(z_encode_np(g.integers(0, n, 12), g.integers(0, n, 12), theta))
        a = DatasetNode(0, ca, theta)
        b = DatasetNode(1, cb, theta)
        lb, ub = node_distance_bounds(a.o, a.r, b.o, b.r)
        exact = min_cell_distance(a.coords, b.coords)
        assert lb - 1e-9 <= exact <= ub + 1e-9

    def test_lb_clamped_at_zero(self):
        o = np.array([0.0, 0.0])
        lb, ub = node_distance_bounds(o, 10.0, o, 10.0)
        assert lb == 0.0 and ub == 20.0
