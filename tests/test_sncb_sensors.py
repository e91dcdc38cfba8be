"""Unit tests for repro.sncb.sensors — per-channel sensor models."""
import numpy as np
import pandas as pd
import pytest

from repro.sncb import sensors
from repro.sncb.sensors import (
    BATTERY_DISCHARGE_S,
    BATTERY_PERIOD_S,
    BATTERY_V_EMPTY,
    BATTERY_V_FULL,
    DEVIATION_THRESHOLD_V,
    EMERGENCY_BAR,
    SEAT_CAPACITY,
    expected_battery_voltage,
)
from repro.sncb.trains import fleet


@pytest.fixture(scope="module")
def base():
    # 1 h of fleet data at 1 Hz: long enough for battery faults
    # (fault_after_frac=0.5) and several station stops.
    return fleet(duration_s=3600.0, seed=0)


class TestExpectedBatteryVoltage:
    def test_full_at_cycle_start(self):
        assert expected_battery_voltage(np.array([0.0]))[0] == BATTERY_V_FULL

    def test_empty_at_discharge_end(self):
        v = expected_battery_voltage(np.array([BATTERY_DISCHARGE_S]))[0]
        assert v == pytest.approx(BATTERY_V_EMPTY)

    def test_full_again_at_period_end(self):
        v = expected_battery_voltage(np.array([BATTERY_PERIOD_S - 1e-6]))[0]
        assert v == pytest.approx(BATTERY_V_FULL, abs=1e-2)

    def test_periodic(self):
        t = np.array([1000.0])
        a = expected_battery_voltage(t)
        b = expected_battery_voltage(t + BATTERY_PERIOD_S)
        np.testing.assert_allclose(a, b)

    def test_monotone_discharge(self):
        t = np.linspace(0, BATTERY_DISCHARGE_S, 100)
        v = expected_battery_voltage(t)
        assert np.all(np.diff(v) <= 0)

    def test_within_bounds(self):
        t = np.linspace(0, 5 * BATTERY_PERIOD_S, 1000)
        v = expected_battery_voltage(t)
        assert v.min() >= BATTERY_V_EMPTY - 1e-9
        assert v.max() <= BATTERY_V_FULL + 1e-9


class TestBattery:
    def test_columns(self, base):
        df = sensors.battery(base, seed=0)
        for c in ["battery_v", "battery_expected_v", "battery_dev_v",
                  "charging", "battery_temp_c"]:
            assert c in df.columns

    def test_healthy_trains_track_curve(self, base):
        df = sensors.battery(base, seed=0, fault_trains=(), overheat_trains=())
        assert df["battery_dev_v"].abs().max() < 5 * 0.05 + 0.1

    def test_fault_train_deviates(self, base):
        df = sensors.battery(base, seed=0, fault_trains=(1,))
        faulty = df[df["train_id"] == 1]
        healthy = df[df["train_id"] == 0]
        assert faulty["battery_dev_v"].min() < -DEVIATION_THRESHOLD_V
        assert healthy["battery_dev_v"].abs().max() < DEVIATION_THRESHOLD_V

    def test_fault_only_after_half(self, base):
        df = sensors.battery(base, seed=0, fault_trains=(1,), fault_after_frac=0.5)
        faulty = df[df["train_id"] == 1].sort_values("ts")
        tmid = df["ts"].min() + (df["ts"].max() - df["ts"].min()) * 0.5
        before = faulty[faulty["ts"] < tmid]
        assert before["battery_dev_v"].abs().max() < DEVIATION_THRESHOLD_V

    def test_overheat_train_spikes(self, base):
        df = sensors.battery(base, seed=0, overheat_trains=(2,))
        assert df[df["train_id"] == 2]["battery_temp_c"].max() > sensors.OVERHEAT_THRESHOLD_C
        assert df[df["train_id"] == 0]["battery_temp_c"].max() < sensors.OVERHEAT_THRESHOLD_C

    def test_deterministic(self, base):
        a = sensors.battery(base, seed=3)
        b = sensors.battery(base, seed=3)
        pd.testing.assert_frame_equal(a, b)

    def test_dev_is_measured_minus_expected(self, base):
        df = sensors.battery(base, seed=0)
        np.testing.assert_allclose(
            df["battery_dev_v"], df["battery_v"] - df["battery_expected_v"]
        )


class TestBrakes:
    def test_columns(self, base):
        df = sensors.brakes(base, seed=0)
        for c in ["brake_bar", "braking", "is_emergency", "in_hot_segment"]:
            assert c in df.columns

    def test_released_pressure_near_5bar(self, base):
        df = sensors.brakes(base, seed=0, emergency_trains=(), lowpressure_trains=())
        cruising = df[(df["speed_ms"] > 30) & (~df["braking"])]
        assert cruising["brake_bar"].mean() == pytest.approx(5.0, abs=0.1)

    def test_emergency_only_on_designated_trains(self, base):
        # Train 3 (R2, reverse) reaches its hot segment within the 1 h
        # fixture; train 0's is further down R1.
        df = sensors.brakes(base, seed=0, emergency_trains=(3,))
        assert df[df["train_id"] == 3]["is_emergency"].any()
        assert not df[df["train_id"] != 3]["is_emergency"].any()

    def test_emergency_pressure_below_threshold(self, base):
        df = sensors.brakes(base, seed=0, emergency_trains=(0, 3))
        em = df[df["is_emergency"]]
        assert len(em) > 0
        assert em["brake_bar"].max() < EMERGENCY_BAR

    def test_emergency_in_hot_segment_only(self, base):
        df = sensors.brakes(base, seed=0, emergency_trains=(0, 3))
        em = df[df["is_emergency"]]
        assert em["in_hot_segment"].all()

    def test_lowpressure_fault_caps(self, base):
        df = sensors.brakes(base, seed=0, lowpressure_trains=(5,), emergency_trains=())
        lp = df[(df["train_id"] == 5) & (df["speed_ms"] > 30)]
        ok = df[(df["train_id"] == 4) & (df["speed_ms"] > 30)]
        assert lp["brake_bar"].mean() < 4.4
        assert ok["brake_bar"].mean() > 4.8

    def test_braking_flag_matches_decel(self, base):
        df = sensors.brakes(base, seed=0)
        g = df[df["train_id"] == 2].sort_values("ts")
        dv = g["speed_ms"].diff().fillna(0.0)
        np.testing.assert_array_equal(g["braking"], dv < -1e-9)


class TestNoise:
    def test_column(self, base):
        assert "noise_db" in sensors.noise(base, seed=0).columns

    def test_speed_correlation(self, base):
        df = sensors.noise(base, seed=0)
        fast = df[df["speed_ms"] > 30]["noise_db"].mean()
        idle = df[df["speed_ms"] == 0]["noise_db"].mean()
        assert fast > idle + 15

    def test_plausible_range(self, base):
        df = sensors.noise(base, seed=0)
        assert df["noise_db"].min() > 30
        assert df["noise_db"].max() < 95

    def test_squeal_raises_max(self, base):
        loud = sensors.noise(base, seed=0, squeal_prob=0.5, squeal_db=20.0)
        quiet = sensors.noise(base, seed=0, squeal_prob=0.0)
        assert loud["noise_db"].max() > quiet["noise_db"].max() + 5


class TestPassengers:
    def test_columns(self, base):
        df = sensors.passengers(base, seed=0)
        for c in ["onboard", "boarded", "alighted", "capacity", "occupancy"]:
            assert c in df.columns

    def test_nonnegative_counts(self, base):
        df = sensors.passengers(base, seed=0)
        assert (df["onboard"] >= 0).all()
        assert (df["boarded"] >= 0).all()
        assert (df["alighted"] >= 0).all()

    def test_boarding_only_at_stations(self, base):
        df = sensors.passengers(base, seed=0)
        moving = df[df["dwell"] != "station"]
        assert (moving["boarded"] == 0).all()

    def test_occupancy_ratio(self, base):
        df = sensors.passengers(base, seed=0)
        np.testing.assert_allclose(df["occupancy"], df["onboard"] / SEAT_CAPACITY)

    def test_heavy_demand_train_overloads(self, base):
        df = sensors.passengers(base, seed=0, demand_per_train={0: 400.0})
        assert df[df["train_id"] == 0]["onboard"].max() > SEAT_CAPACITY

    def test_conservation_between_stops(self, base):
        df = sensors.passengers(base, seed=0)
        g = df[df["train_id"] == 0].sort_values("ts")
        change = g["onboard"].diff()
        # The stream starts from an empty train: first delta is row 0's count.
        change.iloc[0] = g["onboard"].iloc[0]
        expect = (g["boarded"] - g["alighted"]).where(g["boarded"] + g["alighted"] > 0, 0)
        # Outside boarding events occupancy never changes.
        quiet = (g["boarded"] == 0) & (g["alighted"] == 0)
        assert (change[quiet.to_numpy()] == 0).all()
        assert (change[~quiet.to_numpy()] == expect[~quiet.to_numpy()]).all()


class TestAlerts:
    def test_columns(self, base):
        df = sensors.alerts(base, seed=0)
        assert "alert_kind" in df.columns and "alert_essential" in df.columns

    def test_speeding_alert_on_fast_rows(self, base):
        df = sensors.alerts(base, seed=0, speeding_over_kmh=100.0, malfunction_prob=0.0)
        fast = df[df["speed_kmh"] > 100.0]
        assert (fast["alert_kind"] == "speeding").all()
        assert (~fast["alert_essential"]).all()

    def test_malfunction_always_essential(self, base):
        df = sensors.alerts(base, seed=0, malfunction_prob=0.05)
        mf = df[df["alert_kind"] == "malfunction"]
        assert len(mf) > 0
        assert mf["alert_essential"].all()

    def test_no_alert_rows_blank(self, base):
        df = sensors.alerts(base, seed=0, speeding_over_kmh=1e9, malfunction_prob=0.0)
        assert (df["alert_kind"] == "").all()
