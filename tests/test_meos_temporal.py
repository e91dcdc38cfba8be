"""Unit tests for repro.meos.temporal — temporal point sequences."""
import numpy as np
import pytest

from repro.meos.temporal import TGeomPointSeq


def seq_line():
    """Straight east-bound motion: 100 m in 10 s (10 m/s)."""
    return TGeomPointSeq([0.0, 10.0], [0.0, 100.0], [0.0, 0.0])


def seq_l_shape():
    """East 100 m over 10 s, then north 50 m over 5 s."""
    return TGeomPointSeq([0.0, 10.0, 15.0], [0.0, 100.0, 100.0], [0.0, 0.0, 50.0])


class TestConstruction:
    def test_rejects_unsorted(self):
        with pytest.raises(ValueError):
            TGeomPointSeq([0.0, 0.0], [0.0, 1.0], [0.0, 1.0])

    def test_rejects_decreasing(self):
        with pytest.raises(ValueError):
            TGeomPointSeq([1.0, 0.0], [0.0, 1.0], [0.0, 1.0])

    def test_rejects_empty(self):
        with pytest.raises(ValueError):
            TGeomPointSeq([], [], [])

    def test_rejects_shape_mismatch(self):
        with pytest.raises(ValueError):
            TGeomPointSeq([0.0, 1.0], [0.0], [0.0, 1.0])

    def test_single_instant_ok(self):
        s = TGeomPointSeq([5.0], [1.0], [2.0])
        assert len(s) == 1

    def test_len(self):
        assert len(seq_l_shape()) == 3


class TestBasics:
    def test_duration(self):
        assert seq_l_shape().duration() == 15.0

    def test_duration_single_instant(self):
        assert TGeomPointSeq([5.0], [0.0], [0.0]).duration() == 0.0

    def test_length(self):
        assert seq_l_shape().length() == pytest.approx(150.0)

    def test_length_single_instant(self):
        assert TGeomPointSeq([5.0], [0.0], [0.0]).length() == 0.0

    def test_bbox_tight(self):
        b = seq_l_shape().bbox
        assert (b.xmin, b.xmax) == (0.0, 100.0)
        assert (b.ymin, b.ymax) == (0.0, 50.0)
        assert (b.tmin, b.tmax) == (0.0, 15.0)


class TestValueAt:
    def test_midpoint(self):
        x, y = seq_line().value_at(5.0)
        assert x == pytest.approx(50.0) and y == pytest.approx(0.0)

    def test_at_instants(self):
        x, y = seq_l_shape().value_at(np.array([0.0, 10.0, 15.0]))
        np.testing.assert_allclose(x, [0.0, 100.0, 100.0])
        np.testing.assert_allclose(y, [0.0, 0.0, 50.0])

    def test_outside_is_nan(self):
        x, y = seq_line().value_at(np.array([-1.0, 11.0]))
        assert np.isnan(x).all() and np.isnan(y).all()

    def test_boundary_not_nan(self):
        x, _ = seq_line().value_at(np.array([0.0, 10.0]))
        assert not np.isnan(x).any()

    def test_second_leg_interpolation(self):
        x, y = seq_l_shape().value_at(12.5)
        assert x == pytest.approx(100.0) and y == pytest.approx(25.0)


class TestAtPeriod:
    def test_interior_interpolates_boundaries(self):
        s = seq_line().at_period(2.0, 8.0)
        assert s is not None
        np.testing.assert_allclose(s.t, [2.0, 8.0])
        np.testing.assert_allclose(s.x, [20.0, 80.0])

    def test_keeps_interior_instants(self):
        s = seq_l_shape().at_period(5.0, 12.0)
        assert s is not None
        np.testing.assert_allclose(s.t, [5.0, 10.0, 12.0])
        np.testing.assert_allclose(s.x, [50.0, 100.0, 100.0])
        np.testing.assert_allclose(s.y, [0.0, 0.0, 20.0])

    def test_disjoint_returns_none(self):
        assert seq_line().at_period(20.0, 30.0) is None
        assert seq_line().at_period(-5.0, -1.0) is None

    def test_degenerate_period_single_instant(self):
        s = seq_line().at_period(5.0, 5.0)
        assert s is not None and len(s) == 1
        assert s.x[0] == pytest.approx(50.0)

    def test_period_covering_all_is_identity(self):
        s = seq_l_shape().at_period(-10.0, 100.0)
        assert s is not None
        np.testing.assert_allclose(s.t, seq_l_shape().t)

    def test_invalid_period_raises(self):
        with pytest.raises(ValueError):
            seq_line().at_period(5.0, 1.0)


class TestResample:
    def test_regular_grid(self):
        s = seq_line().resample(2.0)
        np.testing.assert_allclose(s.t, [0.0, 2.0, 4.0, 6.0, 8.0, 10.0])
        np.testing.assert_allclose(s.x, [0.0, 20.0, 40.0, 60.0, 80.0, 100.0])

    def test_imputes_across_gap(self):
        # 60 s GPS gap: resampling at 10 s fills 5 interpolated fixes.
        s = TGeomPointSeq([0.0, 60.0], [0.0, 600.0], [0.0, 0.0]).resample(10.0)
        assert len(s) == 7
        assert s.x[3] == pytest.approx(300.0)

    def test_keeps_final_instant_when_unaligned(self):
        s = seq_line().resample(3.0)
        assert s.t[-1] == pytest.approx(10.0)

    def test_invalid_step_raises(self):
        with pytest.raises(ValueError):
            seq_line().resample(0.0)

    def test_preserves_length_for_straight_motion(self):
        orig = seq_line()
        assert orig.resample(1.0).length() == pytest.approx(orig.length())


class TestSpeed:
    def test_constant_speed(self):
        np.testing.assert_allclose(seq_line().speed(), [10.0])

    def test_two_legs(self):
        np.testing.assert_allclose(seq_l_shape().speed(), [10.0, 10.0])

    def test_single_instant_empty(self):
        assert TGeomPointSeq([0.0], [0.0], [0.0]).speed().size == 0

    def test_stationary_zero(self):
        s = TGeomPointSeq([0.0, 5.0], [3.0, 3.0], [4.0, 4.0])
        np.testing.assert_allclose(s.speed(), [0.0])


class TestTimeWeightedAvg:
    def test_uniform_sampling_equals_trapezoid(self):
        s = TGeomPointSeq([0.0, 1.0, 2.0], [0, 0, 0], [0, 0, 0])
        # values 0, 10, 0 → trapezoid integral 10, duration 2 → 5.
        assert s.time_weighted_avg(np.array([0.0, 10.0, 0.0])) == pytest.approx(5.0)

    def test_irregular_sampling_weights_time(self):
        # value 10 held ~9 s of 10 s, then 0: twavg far above plain mean.
        s = TGeomPointSeq([0.0, 9.0, 10.0], [0, 0, 0], [0, 0, 0])
        tw = s.time_weighted_avg(np.array([10.0, 10.0, 0.0]))
        assert tw == pytest.approx((10 * 9 + 5 * 1) / 10.0)
        assert tw > np.mean([10.0, 10.0, 0.0])

    def test_single_instant_falls_back_to_mean(self):
        s = TGeomPointSeq([0.0], [0.0], [0.0])
        assert s.time_weighted_avg(np.array([7.0])) == 7.0

    def test_misaligned_values_raise(self):
        with pytest.raises(ValueError):
            seq_line().time_weighted_avg(np.array([1.0, 2.0, 3.0]))
