"""Q1 — location-based alert filtering (paper §3.1).

    spark-submit jobs/q1_alert_filtering.py [--duration-s 3600]
"""
from repro.core.queries import q1_alert_filtering
from repro.sncb.events import geofence_events
from repro.sncb.zones import zones_df

from _common import run_job

if __name__ == "__main__":
    zones = zones_df(["maintenance"])
    run_job(
        "q1",
        lambda spark: (lambda df: q1_alert_filtering(df, zones)),
        geofence_events,
        __doc__,
    )
