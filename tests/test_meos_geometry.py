"""Unit tests for repro.meos.geometry — planar primitives."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.meos.geometry import (
    Circle,
    Polygon,
    Rect,
    dist_point_point,
    dist_point_segment,
    dist_segment_segment,
    haversine_m,
    point_in_polygon,
    project_equirect,
    segments_intersect,
    unproject_equirect,
)

coord = st.floats(-1e5, 1e5, allow_nan=False, allow_infinity=False)


class TestProjection:
    def test_origin_maps_to_zero(self):
        x, y = project_equirect(np.array([4.45]), np.array([50.5]))
        assert abs(x[0]) < 1e-6 and abs(y[0]) < 1e-6

    def test_north_positive_y(self):
        _, y = project_equirect(np.array([4.45]), np.array([51.0]))
        assert y[0] > 0

    def test_east_positive_x(self):
        x, _ = project_equirect(np.array([5.0]), np.array([50.5]))
        assert x[0] > 0

    def test_one_degree_lat_is_about_111km(self):
        _, y = project_equirect(np.array([4.45]), np.array([51.5]))
        assert 110_000 < y[0] < 112_500

    def test_roundtrip(self):
        lon = np.array([2.6, 4.45, 6.3])
        lat = np.array([49.6, 50.5, 51.4])
        x, y = project_equirect(lon, lat)
        lon2, lat2 = unproject_equirect(x, y)
        np.testing.assert_allclose(lon2, lon, atol=1e-9)
        np.testing.assert_allclose(lat2, lat, atol=1e-9)

    def test_matches_haversine_within_bounds_in_belgium(self):
        # Distortion bounds DESIGN.md claims for the Belgian extent:
        # <1.5% for arbitrary cross-country pairs, <0.1% for short
        # (<5 km) hops like consecutive GPS fixes.
        rng = np.random.default_rng(0)
        lon = rng.uniform(2.6, 6.3, 400)
        lat = rng.uniform(49.6, 51.4, 400)
        x, y = project_equirect(lon, lat)
        d_plane = np.hypot(x[1:] - x[:-1], y[1:] - y[:-1])
        d_geo = haversine_m(lon[:-1], lat[:-1], lon[1:], lat[1:])
        rel = np.abs(d_plane - d_geo) / np.maximum(d_geo, 1.0)
        assert rel.max() < 0.025
        # Short hops (consecutive GPS fixes, ~100 m) near the origin's
        # latitude band: sub-percent error.
        lat2 = rng.uniform(50.3, 50.7, 200)
        lon2 = rng.uniform(4.0, 5.0, 200)
        dlon = 0.0015  # ~105 m east at this latitude
        xs, ys = project_equirect(lon2, lat2)
        xe, ye = project_equirect(lon2 + dlon, lat2)
        d_plane2 = np.hypot(xe - xs, ye - ys)
        d_geo2 = haversine_m(lon2, lat2, lon2 + dlon, lat2)
        rel2 = np.abs(d_plane2 - d_geo2) / d_geo2
        assert rel2.max() < 0.01


class TestHaversine:
    def test_zero_distance(self):
        assert haversine_m(4.0, 50.0, 4.0, 50.0) == 0.0

    def test_symmetric(self):
        a = haversine_m(4.0, 50.0, 5.0, 51.0)
        b = haversine_m(5.0, 51.0, 4.0, 50.0)
        assert a == pytest.approx(b)

    def test_brussels_antwerp_about_41km(self):
        # Brussels (4.3517, 50.8503) – Antwerp (4.4025, 51.2194)
        d = haversine_m(4.3517, 50.8503, 4.4025, 51.2194)
        assert 40_000 < d < 43_000

    def test_vectorised(self):
        d = haversine_m(np.zeros(3), np.zeros(3), np.ones(3), np.zeros(3))
        assert d.shape == (3,)
        np.testing.assert_allclose(d, d[0])


class TestPointSegment:
    def test_point_on_segment(self):
        assert dist_point_segment(0.5, 0.0, 0.0, 0.0, 1.0, 0.0) == 0.0

    def test_perpendicular_foot_inside(self):
        assert dist_point_segment(0.5, 2.0, 0.0, 0.0, 1.0, 0.0) == pytest.approx(2.0)

    def test_clamps_to_endpoint(self):
        assert dist_point_segment(-3.0, 4.0, 0.0, 0.0, 1.0, 0.0) == pytest.approx(5.0)

    def test_degenerate_segment_is_point_distance(self):
        assert dist_point_segment(3.0, 4.0, 0.0, 0.0, 0.0, 0.0) == pytest.approx(5.0)

    def test_vectorised_points(self):
        px = np.array([0.5, 2.0, -1.0])
        py = np.array([1.0, 0.0, 0.0])
        d = dist_point_segment(px, py, 0.0, 0.0, 1.0, 0.0)
        np.testing.assert_allclose(d, [1.0, 1.0, 1.0])

    @given(coord, coord, coord, coord, coord, coord)
    @settings(max_examples=50, deadline=None)
    def test_never_exceeds_endpoint_distances(self, px, py, ax, ay, bx, by):
        d = dist_point_segment(px, py, ax, ay, bx, by)
        da = np.hypot(px - ax, py - ay)
        db = np.hypot(px - bx, py - by)
        assert d <= min(da, db) + 1e-6


class TestSegmentsIntersect:
    def test_crossing(self):
        assert segments_intersect(0, 0, 1, 1, 0, 1, 1, 0)

    def test_parallel_disjoint(self):
        assert not segments_intersect(0, 0, 1, 0, 0, 1, 1, 1)

    def test_t_touch(self):
        assert segments_intersect(0, 0, 2, 0, 1, 0, 1, 1)

    def test_collinear_overlap(self):
        assert segments_intersect(0, 0, 2, 0, 1, 0, 3, 0)

    def test_collinear_disjoint(self):
        assert not segments_intersect(0, 0, 1, 0, 2, 0, 3, 0)


class TestSegmentSegment:
    def test_intersecting_is_zero(self):
        assert dist_segment_segment(0, 0, 1, 1, 0, 1, 1, 0) == 0.0

    def test_parallel_unit_apart(self):
        assert dist_segment_segment(0, 0, 1, 0, 0, 1, 1, 1) == pytest.approx(1.0)

    def test_endpoint_to_endpoint(self):
        assert dist_segment_segment(0, 0, 1, 0, 4, 4, 9, 9) == pytest.approx(5.0)

    def test_symmetric(self):
        a = dist_segment_segment(0, 0, 1, 0, 3, 1, 5, 2)
        b = dist_segment_segment(3, 1, 5, 2, 0, 0, 1, 0)
        assert a == pytest.approx(b)


SQUARE = np.array([[0.0, 0.0], [4.0, 0.0], [4.0, 4.0], [0.0, 4.0]])
CONCAVE = np.array([[0, 0], [6, 0], [6, 6], [3, 3], [0, 6]], dtype=float)


class TestPointInPolygon:
    def test_inside_square(self):
        assert point_in_polygon(np.array([2.0]), np.array([2.0]), SQUARE)[0]

    def test_outside_square(self):
        assert not point_in_polygon(np.array([5.0]), np.array([2.0]), SQUARE)[0]

    def test_boundary_counts_inside(self):
        assert point_in_polygon(np.array([0.0]), np.array([2.0]), SQUARE)[0]

    def test_vertex_counts_inside(self):
        assert point_in_polygon(np.array([0.0]), np.array([0.0]), SQUARE)[0]

    def test_concave_notch_outside(self):
        # (3, 5) sits inside the notch of the concave polygon.
        assert not point_in_polygon(np.array([3.0]), np.array([5.0]), CONCAVE)[0]

    def test_concave_arm_inside(self):
        assert point_in_polygon(np.array([1.0]), np.array([4.0]), CONCAVE)[0]

    def test_vectorised(self):
        px = np.array([2.0, 5.0, -1.0])
        py = np.array([2.0, 2.0, 2.0])
        np.testing.assert_array_equal(
            point_in_polygon(px, py, SQUARE), [True, False, False]
        )

    @given(st.floats(0.1, 3.9), st.floats(0.1, 3.9))
    @settings(max_examples=50, deadline=None)
    def test_interior_points_always_inside_square(self, x, y):
        assert point_in_polygon(np.array([x]), np.array([y]), SQUARE)[0]


class TestRect:
    R = Rect(0.0, 0.0, 4.0, 2.0)

    def test_contains_inside(self):
        assert self.R.contains(1.0, 1.0)

    def test_contains_boundary(self):
        assert self.R.contains(0.0, 2.0)

    def test_not_contains(self):
        assert not self.R.contains(5.0, 1.0)

    def test_distance_inside_zero(self):
        assert self.R.distance(2.0, 1.0) == 0.0

    def test_distance_side(self):
        assert self.R.distance(6.0, 1.0) == pytest.approx(2.0)

    def test_distance_corner(self):
        assert self.R.distance(7.0, 6.0) == pytest.approx(5.0)

    def test_center(self):
        assert self.R.center == (2.0, 1.0)

    def test_matches_polygon_distance(self):
        poly = Polygon([[0, 0], [4, 0], [4, 2], [0, 2]])
        rng = np.random.default_rng(1)
        px = rng.uniform(-5, 9, 100)
        py = rng.uniform(-5, 7, 100)
        np.testing.assert_allclose(
            self.R.distance(px, py), poly.distance(px, py), atol=1e-9
        )


class TestCircle:
    C = Circle(0.0, 0.0, 2.0)

    def test_contains_center(self):
        assert self.C.contains(0.0, 0.0)

    def test_contains_rim(self):
        assert self.C.contains(2.0, 0.0)

    def test_not_contains(self):
        assert not self.C.contains(2.1, 0.0)

    def test_distance_outside(self):
        assert self.C.distance(5.0, 0.0) == pytest.approx(3.0)

    def test_distance_inside_zero(self):
        assert self.C.distance(1.0, 1.0) == 0.0

    def test_center(self):
        assert self.C.center == (0.0, 0.0)


class TestPolygon:
    def test_rejects_too_few_vertices(self):
        with pytest.raises(ValueError):
            Polygon([[0, 0], [1, 1]])

    def test_drops_closing_vertex(self):
        p = Polygon([[0, 0], [1, 0], [1, 1], [0, 0]])
        assert len(p.ring) == 3

    def test_distance_outside(self):
        p = Polygon(SQUARE)
        assert p.distance(np.array([6.0]), np.array([2.0]))[0] == pytest.approx(2.0)

    def test_distance_inside_zero(self):
        p = Polygon(SQUARE)
        assert p.distance(np.array([2.0]), np.array([2.0]))[0] == 0.0

    def test_center(self):
        cx, cy = Polygon(SQUARE).center
        assert (cx, cy) == (2.0, 2.0)


class TestDistPointPoint:
    def test_345(self):
        assert dist_point_point(0.0, 0.0, 3.0, 4.0) == pytest.approx(5.0)

    def test_broadcasting(self):
        d = dist_point_point(np.zeros(4), np.zeros(4), 3.0, 4.0)
        np.testing.assert_allclose(d, 5.0)
