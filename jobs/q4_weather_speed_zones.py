"""Q4 — weather-based speed zones (paper §3.1, OpenMeteo substitute).

    spark-submit jobs/q4_weather_speed_zones.py [--duration-s 3600]
"""
from repro.core.queries import q4_weather_speed_zones
from repro.sncb.events import geofence_events
from repro.sncb.trains import T0_EPOCH
from repro.sncb.weather import weather_stream

from _common import run_job, stream_args

if __name__ == "__main__":
    def builder(spark):
        # Weather table covers the full stream duration; parsed lazily
        # at transform time so --duration-s is respected.
        def transform(df):
            import pandas as pd

            ts_max = df.selectExpr("max(ts) AS m").collect()[0]["m"]
            wx = spark.createDataFrame(
                weather_stream(t0=T0_EPOCH, duration_s=ts_max - T0_EPOCH + 1, seed=0)
            )
            return q4_weather_speed_zones(df, wx)

        return transform

    run_job("q4", builder, geofence_events, __doc__)
