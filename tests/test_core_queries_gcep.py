"""Oracle-backed tests for the GCEP queries Q5–Q8 (§3.2)."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.core.queries import (
    q5_battery_monitoring,
    q6_extra_train_suggestion,
    q6_heavy_passenger_load,
    q7_unscheduled_stops,
    q8_emergency_clusters,
    q8_low_pressure,
)
from repro.oracle import assert_equivalent
from repro.sncb.events import passenger_events
from repro.sncb.sensors import SEAT_CAPACITY
from repro.sncb.zones import zones_df, zones_sql_predicate


@pytest.fixture(scope="module")
def workshops():
    return zones_df(["workshop"])


@pytest.fixture(scope="module")
def allowed_zones():
    return zones_df(["station", "workshop"])


class TestQ5BatteryMonitoring:
    def test_oracle_equivalence(self, battery_sdf, battery_pdf, workshops):
        out = q5_battery_monitoring(battery_sdf, workshops)
        ts_min = int(battery_pdf["ts"].min())
        ts_max = int(battery_pdf["ts"].max())
        ws_min = (ts_min // 60) * 60 - 240
        t0 = float(battery_pdf["ts"].min())
        # The reference charge/discharge curve, in SQL (mirror of
        # sensors.expected_battery_voltage, evaluated by the query UDF).
        expected_sql = (
            f"(CASE WHEN ((e.ts - {t0!r}) % 10800.0) < 7200.0 "
            f"THEN 27.5 - 3.0 * ((e.ts - {t0!r}) % 10800.0) / 7200.0 "
            f"ELSE 24.5 + 3.0 * (((e.ts - {t0!r}) % 10800.0) - 7200.0) / 3600.0 END)"
        )
        assert_equivalent(
            out,
            f"""
            WITH starts AS (
              SELECT unnest(range({ws_min}, {ts_max} + 1, 60)) AS ws
            ),
            win AS (
              SELECT s.ws, e.train_id,
                     avg(e.battery_v - {expected_sql}) AS avg_dev_v,
                     max(e.battery_temp_c) AS max_temp_c,
                     arg_max(e.x, e.ts) AS x_last,
                     arg_max(e.y, e.ts) AS y_last
              FROM ev e JOIN starts s
                ON e.ts >= s.ws AND e.ts < s.ws + 300
              GROUP BY 1, 2
            )
            SELECT CAST(ws AS BIGINT) AS w_start_s, train_id, avg_dev_v, max_temp_c,
                   abs(avg_dev_v) > 0.8 AS alert_deviation,
                   max_temp_c > 55.0 AS alert_overheat,
                   (SELECT w.zone_id FROM wshops w
                    ORDER BY (win.x_last - w.cx)*(win.x_last - w.cx)
                           + (win.y_last - w.cy)*(win.y_last - w.cy) ASC,
                             w.zone_id ASC
                    LIMIT 1) AS workshop_id
            FROM win
            WHERE abs(avg_dev_v) > 0.8 OR max_temp_c > 55.0
            """,
            ev=battery_pdf.drop(columns=["t"]),
            wshops=workshops,
        )

    def test_deviation_alerts_only_fault_train(self, battery_sdf, workshops):
        out = q5_battery_monitoring(battery_sdf, workshops).toPandas()
        dev = out[out["alert_deviation"]]
        assert len(dev) > 0
        assert set(dev["train_id"]) == {1}  # default fault_trains=(1,)

    def test_overheat_alerts_only_overheat_train(self, battery_sdf, workshops):
        out = q5_battery_monitoring(battery_sdf, workshops).toPandas()
        hot = out[out["alert_overheat"]]
        assert len(hot) > 0
        assert set(hot["train_id"]) == {2}  # default overheat_trains=(2,)

    def test_every_alert_has_workshop(self, battery_sdf, workshops):
        out = q5_battery_monitoring(battery_sdf, workshops).toPandas()
        assert (out["workshop_id"] >= 0).all()
        assert set(out["workshop_id"]).issubset(set(workshops["zone_id"]))

    def test_healthy_trains_silent(self, battery_sdf, workshops):
        out = q5_battery_monitoring(battery_sdf, workshops).toPandas()
        assert not set(out["train_id"]) & {0, 3, 4, 5}

    def test_tighter_threshold_more_alerts(self, battery_sdf, workshops):
        loose = q5_battery_monitoring(battery_sdf, workshops, dev_threshold_v=1.0).count()
        tight = q5_battery_monitoring(battery_sdf, workshops, dev_threshold_v=0.3).count()
        assert tight >= loose


class TestQ6HeavyPassengerLoad:
    def test_oracle_equivalence(self, passenger_sdf, passenger_pdf):
        out = q6_heavy_passenger_load(passenger_sdf)
        assert_equivalent(
            out,
            """
            SELECT CAST(floor(ts / 60) * 60 AS BIGINT) AS w_start_s,
                   train_id,
                   max(onboard) AS max_onboard,
                   max(capacity) AS capacity,
                   CAST(max(onboard) AS DOUBLE) / max(capacity) AS occupancy,
                   CAST(max(onboard) AS DOUBLE) / max(capacity) >= 1.0 AS is_full
            FROM ev GROUP BY 1, 2
            """,
            ev=passenger_pdf.drop(columns=["t"]),
        )

    def test_every_train_every_window(self, passenger_sdf):
        out = q6_heavy_passenger_load(passenger_sdf).toPandas()
        assert out["train_id"].nunique() == 6
        # 1800 s → 30 windows per train.
        assert out.groupby("train_id").size().eq(30).all()

    def test_full_flag_fires_under_heavy_demand(self, spark):
        pdf = passenger_events(duration_s=2400.0, seed=0)
        # Overload train 0 manually: demand cannot exceed capacity in a
        # short run with the default demand, so scale the counts.
        pdf = pdf.copy()
        pdf.loc[pdf["train_id"] == 0, "onboard"] *= 4
        out = q6_heavy_passenger_load(spark.createDataFrame(pdf)).toPandas()
        assert out[out["train_id"] == 0]["is_full"].any()
        assert not out[out["train_id"] == 3]["is_full"].any()

    def test_extra_train_suggestion(self, spark):
        pdf = passenger_events(duration_s=2400.0, seed=0).copy()
        pdf.loc[pdf["train_id"] == 0, "onboard"] *= 4
        wins = q6_heavy_passenger_load(spark.createDataFrame(pdf))
        sug = q6_extra_train_suggestion(wins, full_frac_threshold=0.1).toPandas()
        assert bool(sug[sug["train_id"] == 0]["suggest_extra_train"].iloc[0])
        assert not sug[sug["train_id"] == 3]["suggest_extra_train"].iloc[0]

    def test_occupancy_bounds(self, passenger_sdf):
        out = q6_heavy_passenger_load(passenger_sdf).toPandas()
        assert (out["occupancy"] >= 0).all()
        assert (out["capacity"] == SEAT_CAPACITY).all()


class TestQ7UnscheduledStops:
    def test_oracle_equivalence(self, stop_sdf, stop_pdf, allowed_zones):
        out = q7_unscheduled_stops(stop_sdf, allowed_zones, min_stop_s=90.0)
        pred = zones_sql_predicate(allowed_zones, "x_first", "y_first")
        assert_equivalent(
            out,
            f"""
            WITH flagged AS (
              SELECT train_id, ts, x, y, (speed_ms < 0.5) AS stopped,
                     row_number() OVER (PARTITION BY train_id ORDER BY ts)
                   - row_number() OVER (PARTITION BY train_id, (speed_ms < 0.5)
                                        ORDER BY ts) AS grp
              FROM ev
            ),
            runs AS (
              SELECT train_id,
                     min(ts) AS w_start, max(ts) AS w_end,
                     max(ts) - min(ts) AS duration_s,
                     count(*) AS n_events,
                     arg_min(x, ts) AS x_first, arg_min(y, ts) AS y_first
              FROM flagged WHERE stopped
              GROUP BY train_id, grp
              HAVING max(ts) - min(ts) >= 90
            )
            SELECT train_id, w_start, w_end, duration_s, n_events,
                   x_first, y_first, NOT {pred} AS unscheduled
            FROM runs
            """,
            ev=stop_pdf[["train_id", "ts", "x", "y", "speed_ms"]],
        )

    def test_matches_ground_truth(self, stop_sdf, stop_pdf, allowed_zones):
        """Detected unscheduled stops must coincide with the simulator's
        injected unscheduled dwells, and detected-but-scheduled stops
        with station dwells."""
        out = q7_unscheduled_stops(stop_sdf, allowed_zones, min_stop_s=90.0).toPandas()
        assert len(out) > 0
        truth = stop_pdf[["train_id", "ts", "dwell"]]
        for row in out.itertuples():
            mid = (row.w_start + row.w_end) / 2.0
            near = truth[
                (truth["train_id"] == row.train_id)
                & (truth["ts"] >= row.w_start)
                & (truth["ts"] <= row.w_end)
            ]
            kinds = set(near["dwell"]) - {""}
            if row.unscheduled:
                assert "unscheduled" in kinds, f"false positive at {mid}"
            else:
                assert "station" in kinds, f"missed station at {mid}"

    def test_detects_at_least_one_unscheduled(self, stop_sdf, allowed_zones):
        out = q7_unscheduled_stops(stop_sdf, allowed_zones, min_stop_s=90.0).toPandas()
        assert out["unscheduled"].any()

    def test_station_stops_not_unscheduled(self, stop_sdf, allowed_zones):
        # At a 45 s threshold the 60 s station dwells are detected too;
        # the geofence check must classify them as scheduled.
        out = q7_unscheduled_stops(stop_sdf, allowed_zones, min_stop_s=45.0).toPandas()
        sched = out[~out["unscheduled"]]
        assert len(sched) > 0

    def test_min_duration_monotone(self, stop_sdf, allowed_zones):
        short = q7_unscheduled_stops(stop_sdf, allowed_zones, min_stop_s=30.0).count()
        long = q7_unscheduled_stops(stop_sdf, allowed_zones, min_stop_s=200.0).count()
        assert long <= short


class TestQ8BrakeMonitoring:
    def test_clusters_oracle_equivalence(self, brake_sdf, brake_pdf):
        out = q8_emergency_clusters(brake_sdf)
        assert_equivalent(
            out,
            """
            WITH em AS (
              SELECT *, CAST(floor(s_route / 5000) AS BIGINT) AS segment
              FROM ev WHERE brake_bar < 1.5
            )
            SELECT CAST(floor(ts / 120) * 120 AS BIGINT) AS w_start_s,
                   train_id, segment,
                   count(*) AS n_emergency,
                   count(*) >= 3 AS alert
            FROM em GROUP BY 1, 2, 3
            """,
            ev=brake_pdf.drop(columns=["t"]),
        )

    def test_alerts_on_emergency_trains_only(self, brake_sdf, brake_pdf):
        out = q8_emergency_clusters(brake_sdf).toPandas()
        alerts = out[out["alert"]]
        assert len(alerts) > 0
        # Default emergency_trains=(0, 3); only trains that crossed the
        # hot segment can alert.
        assert set(alerts["train_id"]).issubset({0, 3})

    def test_alert_segments_are_hot(self, brake_sdf, brake_pdf):
        out = q8_emergency_clusters(brake_sdf).toPandas()
        hot_segments = set(
            (brake_pdf[brake_pdf["in_hot_segment"]]["s_route"] // 5000).astype(int)
        )
        assert set(out["segment"]).issubset(hot_segments)

    def test_low_pressure_oracle_equivalence(self, brake_sdf, brake_pdf):
        out = q8_low_pressure(brake_sdf)
        assert_equivalent(
            out,
            """
            WITH flagged AS (
              SELECT train_id, ts, brake_bar,
                     (brake_bar < 4.5 AND speed_kmh > 3.6) AS low_p,
                     row_number() OVER (PARTITION BY train_id ORDER BY ts)
                   - row_number() OVER (PARTITION BY train_id,
                                        (brake_bar < 4.5 AND speed_kmh > 3.6)
                                        ORDER BY ts) AS grp
              FROM ev
            )
            SELECT train_id, min(ts) AS w_start, max(ts) AS w_end,
                   max(ts) - min(ts) AS duration_s, count(*) AS n_events,
                   avg(brake_bar) AS brake_bar_mean,
                   min(brake_bar) AS brake_bar_min,
                   max(brake_bar) AS brake_bar_max
            FROM flagged WHERE low_p
            GROUP BY train_id, grp
            HAVING max(ts) - min(ts) >= 120
            """,
            ev=brake_pdf.drop(columns=["t"]),
        )

    def test_low_pressure_flags_faulty_train(self, brake_sdf):
        out = q8_low_pressure(brake_sdf).toPandas()
        assert len(out) > 0
        # Default lowpressure_trains=(5,): the capped train dominates.
        assert 5 in set(out["train_id"])
        long_runs = out[out["duration_s"] > 300]
        assert set(long_runs["train_id"]) == {5}

    def test_low_pressure_values_below_bar(self, brake_sdf):
        out = q8_low_pressure(brake_sdf).toPandas()
        assert (out["brake_bar_max"] < 4.5).all()
