"""Shared fixtures for query-level tests: synthesized SNCB event
streams (pandas + Spark forms) reused across test modules."""
import pandas as pd
import pytest

from repro.sncb.events import (
    battery_events,
    brake_events,
    geofence_events,
    passenger_events,
    stop_events,
)
from repro.sncb.trains import T0_EPOCH
from repro.sncb.weather import weather_stream


@pytest.fixture(scope="session")
def geofence_pdf() -> pd.DataFrame:
    # 60 min at 1 Hz × 6 trains ≈ 21600 events — long enough for trains
    # to reach the mid-route maintenance/curve zones and ≥2 cities.
    return geofence_events(duration_s=3600.0, seed=0)


@pytest.fixture(scope="session")
def geofence_sdf(spark, geofence_pdf):
    return spark.createDataFrame(geofence_pdf).cache()


@pytest.fixture(scope="session")
def battery_pdf() -> pd.DataFrame:
    # 30 min: the battery fault ramps in after 15 min (fault_after_frac).
    return battery_events(duration_s=1800.0, seed=0)


@pytest.fixture(scope="session")
def battery_sdf(spark, battery_pdf):
    return spark.createDataFrame(battery_pdf).cache()


@pytest.fixture(scope="session")
def passenger_pdf() -> pd.DataFrame:
    return passenger_events(duration_s=1800.0, seed=0)


@pytest.fixture(scope="session")
def passenger_sdf(spark, passenger_pdf):
    return spark.createDataFrame(passenger_pdf).cache()


@pytest.fixture(scope="session")
def stop_pdf() -> pd.DataFrame:
    # 40 min so several legs (and unscheduled stops) complete.
    return stop_events(duration_s=2400.0, seed=0)


@pytest.fixture(scope="session")
def stop_sdf(spark, stop_pdf):
    return spark.createDataFrame(stop_pdf).cache()


@pytest.fixture(scope="session")
def brake_pdf() -> pd.DataFrame:
    # 60 min: long enough for emergency trains to cross the hot segment.
    return brake_events(duration_s=3600.0, seed=0)


@pytest.fixture(scope="session")
def brake_sdf(spark, brake_pdf):
    return spark.createDataFrame(brake_pdf).cache()


@pytest.fixture(scope="session")
def weather_pdf() -> pd.DataFrame:
    return weather_stream(t0=T0_EPOCH, duration_s=3600.0, seed=0)


@pytest.fixture(scope="session")
def weather_sdf(spark, weather_pdf):
    return spark.createDataFrame(weather_pdf).cache()
