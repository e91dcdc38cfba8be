"""Unit tests for repro.meos.stbox — spatiotemporal bounding boxes."""
import numpy as np
import pytest

from repro.meos.stbox import STBox


class TestConstruction:
    def test_default_unbounded(self):
        b = STBox()
        assert b.xmin == -np.inf and b.tmax == np.inf

    def test_rejects_inverted_x(self):
        with pytest.raises(ValueError):
            STBox(xmin=1.0, xmax=0.0)

    def test_rejects_inverted_t(self):
        with pytest.raises(ValueError):
            STBox(tmin=10.0, tmax=5.0)

    def test_from_points_tight(self):
        b = STBox.from_points([1, 3, 2], [5, 4, 9], [10, 20, 15])
        assert (b.xmin, b.xmax) == (1, 3)
        assert (b.ymin, b.ymax) == (4, 9)
        assert (b.tmin, b.tmax) == (10, 20)

    def test_from_points_empty_raises(self):
        with pytest.raises(ValueError):
            STBox.from_points(np.empty(0), np.empty(0), np.empty(0))

    def test_frozen(self):
        with pytest.raises(Exception):
            STBox().xmin = 5  # type: ignore[misc]


class TestContainsPoint:
    B = STBox(0, 10, 0, 10, 100, 200)

    def test_inside(self):
        assert self.B.contains_point(5, 5, 150)

    def test_boundary_closed(self):
        assert self.B.contains_point(0, 10, 100)
        assert self.B.contains_point(10, 0, 200)

    def test_outside_space(self):
        assert not self.B.contains_point(11, 5, 150)

    def test_outside_time(self):
        assert not self.B.contains_point(5, 5, 99)

    def test_vectorised(self):
        got = self.B.contains_point(
            np.array([5.0, 11.0]), np.array([5.0, 5.0]), np.array([150.0, 150.0])
        )
        np.testing.assert_array_equal(got, [True, False])

    def test_unbounded_time_ignores_t(self):
        b = STBox(0, 10, 0, 10)
        assert b.contains_point(5, 5, -1e12)


class TestBoxPredicates:
    def test_intersects_overlap(self):
        assert STBox(0, 10, 0, 10, 0, 10).intersects(STBox(5, 15, 5, 15, 5, 15))

    def test_intersects_touching_edge(self):
        assert STBox(0, 10, 0, 10, 0, 10).intersects(STBox(10, 20, 0, 10, 0, 10))

    def test_disjoint_space(self):
        assert not STBox(0, 1, 0, 1, 0, 10).intersects(STBox(2, 3, 0, 1, 0, 10))

    def test_disjoint_time_only(self):
        assert not STBox(0, 1, 0, 1, 0, 10).intersects(STBox(0, 1, 0, 1, 20, 30))

    def test_intersects_symmetric(self):
        a, b = STBox(0, 5, 0, 5, 0, 5), STBox(3, 9, 3, 9, 3, 9)
        assert a.intersects(b) == b.intersects(a)

    def test_contains_box(self):
        assert STBox(0, 10, 0, 10, 0, 10).contains_box(STBox(1, 9, 1, 9, 1, 9))

    def test_contains_box_not_partial(self):
        assert not STBox(0, 10, 0, 10, 0, 10).contains_box(STBox(5, 15, 1, 9, 1, 9))

    def test_contains_box_self(self):
        b = STBox(0, 10, 0, 10, 0, 10)
        assert b.contains_box(b)


class TestTransforms:
    def test_expand_space(self):
        b = STBox(0, 10, 0, 10, 0, 10).expand_space(2)
        assert (b.xmin, b.xmax, b.ymin, b.ymax) == (-2, 12, -2, 12)
        assert (b.tmin, b.tmax) == (0, 10)

    def test_expand_space_negative_raises(self):
        with pytest.raises(ValueError):
            STBox().expand_space(-1)

    def test_expand_time(self):
        b = STBox(0, 1, 0, 1, 100, 200).expand_time(50)
        assert (b.tmin, b.tmax) == (50, 250)
        assert (b.xmin, b.xmax) == (0, 1)

    def test_expand_time_negative_raises(self):
        with pytest.raises(ValueError):
            STBox().expand_time(-0.1)

    def test_union_covers_both(self):
        a, b = STBox(0, 1, 0, 1, 0, 1), STBox(5, 6, -3, 0, 10, 20)
        u = a.union(b)
        assert u.contains_box(a) and u.contains_box(b)

    def test_union_commutative(self):
        a, b = STBox(0, 1, 0, 1, 0, 1), STBox(5, 6, -3, 0, 10, 20)
        assert a.union(b) == b.union(a)
