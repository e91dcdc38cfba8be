"""Q3 — dynamic speed limit in high-risk zones (paper §3.1).

    spark-submit jobs/q3_dynamic_speed_limit.py [--duration-s 3600]
"""
from repro.core.queries import q3_dynamic_speed_limit
from repro.sncb.events import geofence_events
from repro.sncb.zones import zones_df

from _common import run_job

if __name__ == "__main__":
    zones = zones_df(["curve"])
    run_job(
        "q3",
        lambda spark: (lambda df: q3_dynamic_speed_limit(df, zones)),
        geofence_events,
        __doc__,
    )
