"""Q2 — location-based noise monitoring (paper §3.1).

    spark-submit jobs/q2_noise_monitoring.py [--duration-s 3600]
"""
from repro.core.queries import q2_noise_monitoring
from repro.sncb.events import geofence_events
from repro.sncb.zones import zones_df

from _common import run_job

if __name__ == "__main__":
    zones = zones_df(["neighbourhood"])
    run_job(
        "q2",
        lambda spark: (lambda df: q2_noise_monitoring(df, zones)),
        geofence_events,
        __doc__,
    )
