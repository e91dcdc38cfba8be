"""Unit tests for repro.sncb.trains — kinematic motion simulation."""
import numpy as np
import pandas as pd
import pytest

from repro.sncb.network import TRAIN_ASSIGNMENT, route_length
from repro.sncb.trains import (
    DEFAULT_VMAX_MS,
    T0_EPOCH,
    _sample_move,
    _trapezoid,
    fleet,
    simulate_train,
)


class TestTrapezoid:
    def test_long_leg_reaches_vmax(self):
        v, t_acc, T = _trapezoid(100_000.0, 33.3, 0.5)
        assert v == pytest.approx(33.3)
        assert t_acc == pytest.approx(66.6)
        assert T > 2 * t_acc

    def test_short_leg_triangular(self):
        L = 100.0
        v, t_acc, T = _trapezoid(L, 33.3, 0.5)
        assert v == pytest.approx(np.sqrt(0.5 * L))
        assert T == pytest.approx(2 * t_acc)

    def test_profile_covers_distance(self):
        for L in (100.0, 5_000.0, 60_000.0):
            _, _, T = _trapezoid(L, 33.3, 0.5)
            s, v = _sample_move(np.array([T]), L, 33.3, 0.5)
            assert s[0] == pytest.approx(L, rel=1e-6)
            assert v[0] == pytest.approx(0.0, abs=1e-6)

    def test_profile_monotonic(self):
        L = 20_000.0
        _, _, T = _trapezoid(L, 33.3, 0.5)
        tau = np.linspace(0, T, 500)
        s, v = _sample_move(tau, L, 33.3, 0.5)
        assert np.all(np.diff(s) >= -1e-9)
        assert np.all(v >= 0)
        assert v.max() <= 33.3 + 1e-9


@pytest.fixture(scope="module")
def traj():
    return simulate_train(0, duration_s=3600.0, seed=0)


class TestSimulateTrain:
    def test_columns(self, traj):
        for c in ["train_id", "ts", "x", "y", "lon", "lat", "speed_ms",
                  "speed_kmh", "dwell", "station_id", "leg", "s_route",
                  "route", "direction", "t"]:
            assert c in traj.columns

    def test_timestamps_1hz_strict(self, traj):
        ts = traj["ts"].to_numpy()
        assert np.all(np.diff(ts) == 1.0)
        assert ts[0] == T0_EPOCH

    def test_duration_respected(self, traj):
        assert traj["ts"].max() < T0_EPOCH + 3600.0

    def test_speed_bounded(self, traj):
        assert traj["speed_ms"].max() <= DEFAULT_VMAX_MS + 1e-6
        assert traj["speed_ms"].min() >= 0.0

    def test_speed_kmh_consistent(self, traj):
        np.testing.assert_allclose(
            traj["speed_kmh"], traj["speed_ms"] * 3.6, rtol=1e-12
        )

    def test_dwell_means_stationary(self, traj):
        dwelling = traj[traj["dwell"] != ""]
        assert len(dwelling) > 0
        assert (dwelling["speed_ms"] == 0.0).all()

    def test_station_dwell_has_station_id(self, traj):
        st = traj[traj["dwell"] == "station"]
        assert (st["station_id"] >= 0).all()
        moving = traj[traj["dwell"] == ""]
        assert (moving["station_id"] == -1).all()

    def test_continuous_motion(self, traj):
        # Between consecutive 1 s samples the train moves at most
        # vmax·dt plus small numerical slack.
        d = np.hypot(np.diff(traj["x"]), np.diff(traj["y"]))
        assert d.max() <= DEFAULT_VMAX_MS * 1.0 + 1.0

    def test_s_route_within_route(self, traj):
        L = route_length(traj["route"].iloc[0])
        assert traj["s_route"].min() >= -1e-6
        assert traj["s_route"].max() <= L + 1e-6

    def test_deterministic(self):
        a = simulate_train(2, duration_s=600.0, seed=5)
        b = simulate_train(2, duration_s=600.0, seed=5)
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_unscheduled_stops(self):
        a = simulate_train(0, duration_s=3600.0, seed=1, unscheduled_prob=0.9)
        b = simulate_train(0, duration_s=3600.0, seed=2, unscheduled_prob=0.9)
        ta = a.loc[a["dwell"] == "unscheduled", "ts"].to_numpy()
        tb = b.loc[b["dwell"] == "unscheduled", "ts"].to_numpy()
        assert ta.size and tb.size
        assert not (ta.size == tb.size and np.array_equal(ta, tb))

    def test_unscheduled_stops_can_be_disabled(self):
        df = simulate_train(0, duration_s=3600.0, seed=0, unscheduled_prob=0.0)
        assert (df["dwell"] != "unscheduled").all()

    def test_unscheduled_prob_one_fires(self):
        df = simulate_train(0, duration_s=3600.0, seed=0, unscheduled_prob=1.0)
        assert (df["dwell"] == "unscheduled").any()

    def test_invalid_train_raises(self):
        with pytest.raises(ValueError):
            simulate_train(99, duration_s=10.0)

    def test_invalid_duration_raises(self):
        with pytest.raises(ValueError):
            simulate_train(0, duration_s=0.0)

    def test_direction_respected(self):
        # Opposite-direction trains on the same route start at opposite
        # ends (canonical arc length 0 vs route length).
        a = simulate_train(0, duration_s=120.0, seed=0)
        b = simulate_train(1, duration_s=120.0, seed=0)
        L = route_length("R1")
        assert a["s_route"].iloc[0] == pytest.approx(0.0, abs=1.0)
        assert b["s_route"].iloc[0] == pytest.approx(L, abs=1.0)

    def test_datetime_column_matches_epoch(self, traj):
        secs = traj["t"].astype("int64") / 1e9
        np.testing.assert_allclose(secs, traj["ts"], rtol=0, atol=1e-6)


class TestFleet:
    def test_all_six_trains(self):
        df = fleet(duration_s=300.0)
        assert set(df["train_id"]) == set(TRAIN_ASSIGNMENT)

    def test_same_time_range(self):
        df = fleet(duration_s=300.0)
        for _, g in df.groupby("train_id"):
            assert g["ts"].min() == T0_EPOCH

    def test_row_count_scales_with_duration(self):
        short = fleet(duration_s=200.0)
        long = fleet(duration_s=400.0)
        assert len(long) > len(short) * 1.8

    def test_dt_controls_rate(self):
        coarse = fleet(duration_s=300.0, dt=5.0)
        fine = fleet(duration_s=300.0, dt=1.0)
        assert abs(len(fine) / len(coarse) - 5.0) < 0.5
