"""Unit tests for repro.meos.tpoint_ops — the NebulaMEOS operator kernels."""
import numpy as np
import pytest

from repro.meos.geometry import Circle, Polygon, Rect
from repro.meos.stbox import STBox
from repro.meos.temporal import TGeomPointSeq
from repro.meos.tpoint_ops import (
    _merge_periods,
    edwithin,
    nearest_approach_distance,
    tdwithin_periods,
    tpoint_at_stbox,
)


def east_line():
    """1000 m east over 100 s through the origin."""
    return TGeomPointSeq([0.0, 100.0], [0.0, 1000.0], [0.0, 0.0])


class TestMergePeriods:
    def test_empty(self):
        assert _merge_periods([]) == []

    def test_disjoint_kept(self):
        assert _merge_periods([(0, 1), (2, 3)]) == [(0, 1), (2, 3)]

    def test_overlapping_merged(self):
        assert _merge_periods([(0, 2), (1, 3)]) == [(0, 3)]

    def test_touching_merged(self):
        assert _merge_periods([(0, 1), (1, 2)]) == [(0, 2)]

    def test_unsorted_input(self):
        assert _merge_periods([(5, 6), (0, 1)]) == [(0, 1), (5, 6)]


class TestTpointAtStbox:
    def test_spatial_clip_interpolates_entry_exit(self):
        # Box x ∈ [200, 400] → inside during t ∈ [20, 40].
        pieces = tpoint_at_stbox(east_line(), STBox(xmin=200, xmax=400))
        assert len(pieces) == 1
        np.testing.assert_allclose(pieces[0].t, [20.0, 40.0])
        np.testing.assert_allclose(pieces[0].x, [200.0, 400.0])

    def test_temporal_clip(self):
        pieces = tpoint_at_stbox(east_line(), STBox(tmin=10, tmax=30))
        assert len(pieces) == 1
        np.testing.assert_allclose(pieces[0].x, [100.0, 300.0])

    def test_space_and_time_intersected(self):
        pieces = tpoint_at_stbox(east_line(), STBox(xmin=200, xmax=900, tmin=0, tmax=50))
        assert len(pieces) == 1
        np.testing.assert_allclose(pieces[0].t, [20.0, 50.0])

    def test_disjoint_empty(self):
        assert tpoint_at_stbox(east_line(), STBox(xmin=2000, xmax=3000)) == []

    def test_y_constraint(self):
        # Diagonal motion; y ∈ [0, 50] → first half only.
        seq = TGeomPointSeq([0.0, 100.0], [0.0, 100.0], [0.0, 100.0])
        pieces = tpoint_at_stbox(seq, STBox(ymin=0, ymax=50))
        assert len(pieces) == 1
        np.testing.assert_allclose(pieces[0].t, [0.0, 50.0])

    def test_reentry_produces_two_pieces(self):
        # Out-and-back: enters x≤100 zone, leaves, re-enters.
        seq = TGeomPointSeq(
            [0.0, 10.0, 20.0], [0.0, 200.0, 0.0], [0.0, 0.0, 0.0]
        )
        pieces = tpoint_at_stbox(seq, STBox(xmin=-np.inf, xmax=100))
        assert len(pieces) == 2
        np.testing.assert_allclose(pieces[0].t, [0.0, 5.0])
        np.testing.assert_allclose(pieces[1].t, [15.0, 20.0])

    def test_fully_inside_is_identity(self):
        pieces = tpoint_at_stbox(east_line(), STBox(-1e6, 1e6, -1e6, 1e6, -1e6, 1e6))
        assert len(pieces) == 1
        np.testing.assert_allclose(pieces[0].t, east_line().t)

    def test_single_instant_inside(self):
        s = TGeomPointSeq([5.0], [1.0], [1.0])
        assert len(tpoint_at_stbox(s, STBox(0, 2, 0, 2))) == 1

    def test_single_instant_outside(self):
        s = TGeomPointSeq([5.0], [10.0], [1.0])
        assert tpoint_at_stbox(s, STBox(0, 2, 0, 2)) == []

    def test_touching_boundary_single_point(self):
        # Motion touches box corner region at exactly one instant.
        seq = TGeomPointSeq([0.0, 10.0], [0.0, 100.0], [0.0, 0.0])
        pieces = tpoint_at_stbox(seq, STBox(xmin=100, xmax=200))
        assert len(pieces) == 1
        assert pieces[0].t[0] == pytest.approx(10.0)

    def test_stationary_inside_full_duration(self):
        seq = TGeomPointSeq([0.0, 50.0], [5.0, 5.0], [5.0, 5.0])
        pieces = tpoint_at_stbox(seq, STBox(0, 10, 0, 10))
        assert len(pieces) == 1
        assert pieces[0].duration() == pytest.approx(50.0)


class TestNearestApproach:
    def test_point_closest_mid_segment(self):
        # Point 30 m north of track midpoint — min dist is 30, reached
        # between samples (would be missed by sample-only evaluation).
        d = nearest_approach_distance(east_line(), (500.0, 30.0))
        assert d == pytest.approx(30.0)

    def test_point_beyond_end(self):
        d = nearest_approach_distance(east_line(), (1300.0, 400.0))
        assert d == pytest.approx(500.0)

    def test_circle_reduces_by_radius(self):
        d = nearest_approach_distance(east_line(), Circle(500.0, 30.0, 10.0))
        assert d == pytest.approx(20.0)

    def test_crossing_circle_zero(self):
        assert nearest_approach_distance(east_line(), Circle(500.0, 0.0, 5.0)) == 0.0

    def test_rect_contact(self):
        d = nearest_approach_distance(east_line(), Rect(400, 100, 600, 200))
        assert d == pytest.approx(100.0)

    def test_inside_polygon_zero(self):
        poly = Polygon([[-10, -10], [2000, -10], [2000, 10], [-10, 10]])
        assert nearest_approach_distance(east_line(), poly) == 0.0

    def test_single_instant(self):
        s = TGeomPointSeq([0.0], [0.0], [0.0])
        assert nearest_approach_distance(s, (3.0, 4.0)) == pytest.approx(5.0)


class TestEdwithin:
    def test_true_between_samples(self):
        # The sample points are 0 and 1000; the geometry at x=500 is
        # within 40 m only of the *interpolated* motion.
        assert edwithin(east_line(), (500.0, 30.0), 40.0)

    def test_false_when_too_far(self):
        assert not edwithin(east_line(), (500.0, 30.0), 20.0)

    def test_exact_boundary_true(self):
        assert edwithin(east_line(), (500.0, 30.0), 30.0)

    def test_bbox_prune_path_false(self):
        # Geometry far outside the expanded bbox: pruned before the
        # exact test, still correct.
        assert not edwithin(east_line(), (1e6, 1e6), 10.0)

    def test_rect_geometry(self):
        assert edwithin(east_line(), Rect(400, 50, 600, 200), 60.0)
        assert not edwithin(east_line(), Rect(400, 50, 600, 200), 40.0)

    def test_negative_distance_raises(self):
        with pytest.raises(ValueError):
            edwithin(east_line(), (0.0, 0.0), -1.0)

    def test_crossing_geometry_any_distance(self):
        assert edwithin(east_line(), Circle(500.0, 0.0, 1.0), 0.0)


class TestTdwithinPeriods:
    def test_point_entry_exit_exact(self):
        # Within 50 m of (500, 30): |x−500| ≤ 40 → t ∈ [46, 54].
        periods = tdwithin_periods(east_line(), (500.0, 30.0), 50.0)
        assert len(periods) == 1
        assert periods[0][0] == pytest.approx(46.0)
        assert periods[0][1] == pytest.approx(54.0)

    def test_circle_offsets_radius(self):
        periods = tdwithin_periods(east_line(), Circle(500.0, 30.0, 10.0), 40.0)
        assert len(periods) == 1
        assert periods[0][0] == pytest.approx(46.0)

    def test_never_within_empty(self):
        assert tdwithin_periods(east_line(), (500.0, 300.0), 50.0) == []

    def test_two_approaches_two_periods(self):
        # Passes (0,0) twice: out-and-back motion.
        seq = TGeomPointSeq([0.0, 10.0, 20.0], [-100.0, 100.0, -100.0], [0.0, 0.0, 0.0])
        periods = tdwithin_periods(seq, (0.0, 0.0), 10.0)
        assert len(periods) == 2

    def test_stationary_within_whole_period(self):
        seq = TGeomPointSeq([0.0, 60.0], [5.0, 5.0], [0.0, 0.0])
        assert tdwithin_periods(seq, (0.0, 0.0), 10.0) == [(0.0, 60.0)]

    def test_stationary_outside_empty(self):
        seq = TGeomPointSeq([0.0, 60.0], [50.0, 50.0], [0.0, 0.0])
        assert tdwithin_periods(seq, (0.0, 0.0), 10.0) == []

    def test_single_instant_inside(self):
        seq = TGeomPointSeq([7.0], [3.0], [4.0])
        assert tdwithin_periods(seq, (0.0, 0.0), 5.0) == [(7.0, 7.0)]

    def test_polygon_unsupported(self):
        with pytest.raises(TypeError):
            tdwithin_periods(east_line(), Rect(0, 0, 1, 1), 5.0)

    def test_consistent_with_edwithin(self):
        rng = np.random.default_rng(42)
        for _ in range(20):
            t = np.sort(rng.uniform(0, 100, 5))
            t += np.arange(5) * 1e-3  # ensure strictly increasing
            seq = TGeomPointSeq(t, rng.uniform(-100, 100, 5), rng.uniform(-100, 100, 5))
            g = (rng.uniform(-100, 100), rng.uniform(-100, 100))
            d = rng.uniform(1, 80)
            assert bool(tdwithin_periods(seq, g, d)) == edwithin(seq, g, d)
