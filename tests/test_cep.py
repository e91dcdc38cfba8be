"""Tests for the GCEP pattern layer: spec validation + lowering, and
equivalence of declared patterns with the hand-fused §3.2 queries."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.cep import DeviationFromModel, RepeatedWithin, ThresholdRun, match
from repro.core import queries as Q
from repro.core.udfs import register_meos_udfs
from repro.sncb.trains import T0_EPOCH


class TestPatternValidation:
    def test_threshold_run_rejects_empty_condition(self):
        with pytest.raises(ValueError):
            ThresholdRun(condition="  ", min_duration_s=10)

    def test_threshold_run_rejects_negative_duration(self):
        with pytest.raises(ValueError):
            ThresholdRun(condition="x > 1", min_duration_s=-1)

    def test_repeated_within_rejects_zero_count(self):
        with pytest.raises(ValueError):
            RepeatedWithin(condition="x > 1", min_count=0)

    def test_deviation_rejects_nonpositive_tolerance(self):
        with pytest.raises(ValueError):
            DeviationFromModel(measured_col="v", model_expr="27.5", tolerance=0.0)

    def test_patterns_are_frozen(self):
        p = ThresholdRun(condition="x > 1", min_duration_s=5)
        with pytest.raises(Exception):
            p.min_duration_s = 10  # type: ignore[misc]

    def test_unknown_pattern_type_raises(self, spark):
        df = spark.createDataFrame(pd.DataFrame({"train_id": [1], "ts": [0.0]}))
        with pytest.raises(TypeError):
            match(df, object())


class TestThresholdRunLowering:
    def test_simple_run(self, spark):
        ts = np.arange(0, 200, 10.0)
        v = np.where((ts >= 50) & (ts <= 140), 0.0, 5.0)
        pdf = pd.DataFrame({"train_id": 1, "ts": ts, "speed": v})
        df = spark.createDataFrame(pdf)
        out = match(
            df,
            ThresholdRun(condition="speed < 0.5", min_duration_s=60.0,
                         value_cols=("speed",)),
        ).toPandas()
        assert len(out) == 1
        assert out.iloc[0]["w_start"] == 50.0
        assert out.iloc[0]["w_end"] == 140.0
        assert out.iloc[0]["speed_max"] == 0.0

    def test_q8b_equivalence(self, spark, brake_sdf):
        """The declared low-pressure pattern must reproduce
        q8_low_pressure exactly."""
        declared = match(
            brake_sdf,
            ThresholdRun(
                condition="brake_bar < 4.5 AND speed_kmh > 3.6",
                min_duration_s=120.0,
                value_cols=("brake_bar",),
            ),
        ).select("train_id", "w_start", "w_end", "n_events", "brake_bar_min")
        fused = Q.q8_low_pressure(brake_sdf).select(
            "train_id", "w_start", "w_end", "n_events", "brake_bar_min"
        )
        d = declared.toPandas().sort_values(["train_id", "w_start"]).reset_index(drop=True)
        f = fused.toPandas().sort_values(["train_id", "w_start"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(d, f, check_dtype=False)

    def test_q7_stop_pattern_equivalence(self, spark, stop_sdf):
        declared = match(
            stop_sdf,
            ThresholdRun(condition="speed_ms < 0.5", min_duration_s=90.0,
                         carry_cols=("x", "y")),
        ).select("train_id", "w_start", "w_end", "n_events")
        from repro.sncb.zones import zones_df

        fused = Q.q7_unscheduled_stops(
            stop_sdf, zones_df(["station", "workshop"]), min_stop_s=90.0
        ).select("train_id", "w_start", "w_end", "n_events")
        d = declared.toPandas().sort_values(["train_id", "w_start"]).reset_index(drop=True)
        f = fused.toPandas().sort_values(["train_id", "w_start"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(d, f, check_dtype=False)


class TestRepeatedWithinLowering:
    def test_q8a_equivalence(self, spark, brake_sdf):
        """The declared repeated-emergency pattern must reproduce the
        alert rows of q8_emergency_clusters."""
        declared = match(
            brake_sdf,
            RepeatedWithin(
                condition="brake_bar < 1.5",
                window="120 seconds",
                min_count=3,
                group_exprs=(("segment", "CAST(floor(s_route / 5000) AS LONG)"),),
            ),
        ).select(
            F.col("w_start").cast("long").alias("w_start_s"),
            "train_id", "segment",
            F.col("n_matches").alias("n_emergency"),
        )
        fused = (
            Q.q8_emergency_clusters(brake_sdf)
            .filter("alert")
            .select("w_start_s", "train_id", "segment", "n_emergency")
        )
        d = declared.toPandas().sort_values(["w_start_s", "train_id"]).reset_index(drop=True)
        f = fused.toPandas().sort_values(["w_start_s", "train_id"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(d, f, check_dtype=False)

    def test_min_count_filters(self, spark):
        pdf = pd.DataFrame(
            {
                "train_id": 1,
                "ts": np.arange(0, 120, 10.0),
                "hit": [1, 1, 0, 0, 0, 0, 0, 0, 0, 0, 0, 0],
            }
        )
        pdf["t"] = pd.to_datetime(pdf["ts"], unit="s")
        df = spark.createDataFrame(pdf)
        got3 = match(df, RepeatedWithin(condition="hit = 1", min_count=3)).count()
        got2 = match(df, RepeatedWithin(condition="hit = 1", min_count=2)).count()
        assert got3 == 0 and got2 == 1


class TestDeviationLowering:
    def test_q5_deviation_equivalence(self, spark, battery_sdf):
        """The declared curve-deviation pattern (model = registered MEOS
        UDF) must flag the same windows as q5's deviation alerts."""
        register_meos_udfs(spark)
        declared = match(
            battery_sdf,
            DeviationFromModel(
                measured_col="battery_v",
                model_expr=f"meos_expected_battery_v(ts - {T0_EPOCH!r})",
                tolerance=0.8,
            ),
        ).select(
            F.col("w_start").cast("long").alias("w_start_s"),
            "train_id",
            F.col("avg_dev").alias("avg_dev_v"),
        )
        from repro.sncb.zones import zones_df

        fused = (
            Q.q5_battery_monitoring(battery_sdf, zones_df(["workshop"]))
            .filter("alert_deviation")
            .select("w_start_s", "train_id", "avg_dev_v")
        )
        d = declared.toPandas().sort_values(["w_start_s", "train_id"]).reset_index(drop=True)
        f = fused.toPandas().sort_values(["w_start_s", "train_id"]).reset_index(drop=True)
        pd.testing.assert_frame_equal(d, f, check_dtype=False, atol=1e-9)

    def test_no_deviation_no_match(self, spark):
        pdf = pd.DataFrame(
            {"train_id": 1, "ts": np.arange(0, 600, 10.0)}
        )
        pdf["v"] = 5.0
        pdf["t"] = pd.to_datetime(pdf["ts"], unit="s")
        df = spark.createDataFrame(pdf)
        out = match(
            df,
            DeviationFromModel(measured_col="v", model_expr="5.0", tolerance=0.1),
        )
        assert out.count() == 0
