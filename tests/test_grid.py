"""Exponential grids (Section 3): levels, snapping, enumeration, condition (3)."""
import numpy as np
import pytest

from repro.geometry.boxes import Box, dist_point_box
from repro.geometry.grid import (
    GridParams,
    candidate_cells_from_points,
    cell_box,
    condition3,
    enumerate_cells,
    snap_points,
)


def params(phi=0.1, eps=0.5, alpha=3.0, d=2, c_g=2.0):
    return GridParams(phi=phi, eps_prime=eps, alpha=alpha, d=d, c_g=c_g)


class TestGridParams:
    def test_cell_side_doubles_per_level(self):
        p = params()
        assert p.cell_side(3) == pytest.approx(2 * p.cell_side(2))

    def test_cell_side_formula(self):
        p = params(phi=0.2, eps=0.4, alpha=2.0, d=4, c_g=10.0)
        # side = eps' 2^j Φ / (c_g α √d): diam(cell) = side·√d = eps'2^jΦ/(c_g α)
        assert p.cell_side(0) == pytest.approx(0.4 * 0.2 / (10 * 2 * 2))

    def test_half_extent(self):
        p = params(phi=0.5)
        assert p.half_extent(0) == pytest.approx(0.25)
        assert p.half_extent(4) == pytest.approx(0.5 * 16 / 2)

    def test_max_level_scales_log_n(self):
        p = params(alpha=2.0)
        assert p.max_level(1000) >= 2 * np.log2(1000)
        assert p.max_level(10) < p.max_level(10_000)

    def test_level_of_zero_distance(self):
        p = params(phi=1.0)
        assert p.level_of(np.array([0.0]))[0] == 0

    def test_level_of_monotone(self):
        p = params(phi=1.0)
        d = np.array([0.1, 0.4, 0.5, 0.9, 1.0, 3.0, 100.0])
        lv = p.level_of(d)
        assert (np.diff(lv) >= 0).all()

    def test_level_contains_point(self):
        """A point at L∞ distance dist lands in annulus j with half_extent(j) ≥ dist."""
        p = params(phi=0.3)
        for dist in [0.0, 0.01, 0.2, 1.7, 9.3]:
            j = int(p.level_of(np.array([dist]))[0])
            assert p.half_extent(j) >= dist - 1e-12
            if j > 0:
                assert p.half_extent(j - 1) < dist + 1e-12


class TestSnapping:
    @pytest.mark.parametrize("seed", range(5))
    def test_snapped_cell_contains_point(self, seed):
        g = np.random.default_rng(seed)
        p = params(phi=0.05, d=3)
        x = g.normal(size=3)
        P = x + g.normal(scale=2.0, size=(50, 3))
        levels, coords = snap_points(x, P, p, j_cap=40)
        for i in range(len(P)):
            b = cell_box(x, int(levels[i]), tuple(coords[i]), p)
            assert b.contains(P[i]), (P[i], b)

    def test_j_cap_respected(self):
        p = params(phi=1e-6)
        x = np.zeros(2)
        P = np.array([[1000.0, 1000.0]])
        levels, _ = snap_points(x, P, p, j_cap=5)
        assert levels[0] == 5

    def test_candidate_cells_partition_points(self):
        g = np.random.default_rng(7)
        p = params(phi=0.05, d=2)
        x = np.zeros(2)
        P = g.normal(size=(200, 2))
        idx = np.arange(len(P))
        cells = candidate_cells_from_points(x, P, idx, p, j_cap=40)
        seen = np.concatenate([m for _, _, m in cells])
        assert sorted(seen.tolist()) == idx.tolist()  # every point in exactly one cell

    def test_candidate_cells_sorted_by_level(self):
        g = np.random.default_rng(8)
        p = params(phi=0.05, d=2)
        cells = candidate_cells_from_points(
            np.zeros(2), g.normal(size=(100, 2)), np.arange(100), p, j_cap=40
        )
        levels = [j for j, _, _ in cells]
        assert levels == sorted(levels)

    def test_empty_index(self):
        assert (
            candidate_cells_from_points(
                np.zeros(2), np.zeros((0, 2)), np.arange(0), params(), 10
            )
            == []
        )


class TestEnumeration:
    def test_enumerated_cells_cover_snapped(self):
        """Every snapped (point-bearing) cell appears in the enumeration."""
        g = np.random.default_rng(3)
        p = params(phi=0.2, d=2, c_g=0.5)
        x = np.array([0.3, 0.3])
        P = g.random((100, 2))
        bbox = Box((0.0, 0.0), (1.0, 1.0))
        levels, coords = snap_points(x, P, p, j_cap=p.max_level(100))
        for j in np.unique(levels):
            cells = enumerate_cells(x, int(j), p, bbox)
            for i in np.flatnonzero(levels == j):
                assert any(b.contains(P[i]) for b in cells)

    def test_hole_cells_skipped(self):
        p = params(phi=1.0, d=2, c_g=2.0)
        x = np.zeros(2)
        big = Box((-100.0, -100.0), (100.0, 100.0))
        cells = enumerate_cells(x, 4, p, big)
        h_prev = p.half_extent(3)
        for b in cells:
            inside_hole = all(
                b.lo[i] >= -h_prev and b.hi[i] <= h_prev for i in range(2)
            )
            assert not inside_hole

    def test_bbox_clipping(self):
        p = params(phi=1.0, d=2)
        cells_all = enumerate_cells(np.zeros(2), 2, p, Box((-10, -10), (10, 10)))
        # Clip box overlapping the annulus (not its hole Q_{i,1}).
        cells_clip = enumerate_cells(np.zeros(2), 2, p, Box((1.2, 1.2), (1.8, 1.8)))
        assert 0 < len(cells_clip) < len(cells_all)

    def test_max_cells_guard(self):
        p = params(phi=1.0, d=2, eps=0.01)
        with pytest.raises(RuntimeError):
            enumerate_cells(np.zeros(2), 8, p, Box((-99, -99), (99, 99)), max_cells=10)


class TestCondition3:
    def test_own_nearest_center_passes(self):
        # The cell right next to x_i passes: φ(x_i,□) = 0 ≤ anything.
        centers = np.array([[0.0, 0.0], [10.0, 10.0]])
        b = Box((0.0, 0.0), (0.1, 0.1))
        assert condition3(b, 0, centers)

    def test_far_center_with_near_rival_fails(self):
        centers = np.array([[100.0, 100.0], [0.0, 0.0]])
        b = Box((0.0, 0.0), (0.1, 0.1))
        assert not condition3(b, 0, centers)

    def test_borderline_diam_slack(self):
        # φ(x_0,□)=1, φ(x_1,□)=0, diam=√2·2 > 1 → passes thanks to the slack.
        centers = np.array([[3.0, 0.0], [0.0, 0.0]])
        b = Box((0.0, 0.0), (2.0, 2.0))
        assert condition3(b, 0, centers)
        assert dist_point_box(centers[0], b) == pytest.approx(1.0)
