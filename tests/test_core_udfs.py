"""Tests for repro.core.udfs — SQL-level MEOS function registration."""
import numpy as np
import pandas as pd
import pytest

from repro.core.udfs import MEOS_UDF_NAMES, register_meos_udfs
from repro.meos.geometry import haversine_m
from repro.sncb.sensors import expected_battery_voltage
from repro.sncb.weather import cell_id_of


@pytest.fixture(scope="module", autouse=True)
def registered(spark):
    return register_meos_udfs(spark)


class TestRegistration:
    def test_returns_all_names(self, registered):
        assert registered == MEOS_UDF_NAMES

    def test_functions_visible_in_catalog(self, spark):
        names = {f.name for f in spark.catalog.listFunctions()}
        for n in MEOS_UDF_NAMES:
            assert n in names


class TestSqlExecution:
    def test_expected_battery_v(self, spark):
        got = spark.sql(
            "SELECT meos_expected_battery_v(CAST(0.0 AS DOUBLE)) AS v"
        ).toPandas()
        assert got["v"][0] == pytest.approx(expected_battery_voltage(np.array([0.0]))[0])

    def test_expected_battery_v_vectorised(self, spark):
        pdf = pd.DataFrame({"ts_rel": np.linspace(0, 10_800, 50)})
        spark.createDataFrame(pdf).createOrReplaceTempView("batt")
        got = spark.sql(
            "SELECT ts_rel, meos_expected_battery_v(ts_rel) AS v FROM batt ORDER BY ts_rel"
        ).toPandas()
        np.testing.assert_allclose(
            got["v"], expected_battery_voltage(pdf["ts_rel"].to_numpy()), rtol=1e-12
        )

    def test_weather_cell(self, spark):
        pdf = pd.DataFrame({"x": [0.0, 50_000.0], "y": [0.0, -30_000.0]})
        spark.createDataFrame(pdf).createOrReplaceTempView("pos")
        got = spark.sql(
            "SELECT meos_weather_cell(x, y) AS c FROM pos ORDER BY x"
        ).toPandas()
        np.testing.assert_array_equal(
            got["c"].to_numpy(), cell_id_of(pdf["x"].to_numpy(), pdf["y"].to_numpy())
        )

    def test_haversine(self, spark):
        got = spark.sql(
            "SELECT meos_haversine_m(4.3517, 50.8503, 4.4025, 51.2194) AS d"
        ).toPandas()
        expected = haversine_m(4.3517, 50.8503, 4.4025, 51.2194)
        assert got["d"][0] == pytest.approx(float(expected))

    def test_usable_in_where_clause(self, spark):
        """The registered kernels compose with relational operators —
        the point of the plugin integration."""
        pdf = pd.DataFrame({"ts_rel": [0.0, 7200.0], "v": [27.4, 23.0]})
        spark.createDataFrame(pdf).createOrReplaceTempView("readings")
        got = spark.sql(
            """
            SELECT ts_rel FROM readings
            WHERE abs(v - meos_expected_battery_v(ts_rel)) > 0.8
            """
        ).toPandas()
        assert list(got["ts_rel"]) == [7200.0]
