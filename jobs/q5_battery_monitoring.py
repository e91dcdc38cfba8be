"""Q5 — battery monitoring with nearest-workshop lookup (paper §3.2).

    spark-submit jobs/q5_battery_monitoring.py [--duration-s 3600]
"""
from repro.core.queries import q5_battery_monitoring
from repro.sncb.events import battery_events
from repro.sncb.zones import zones_df

from _common import run_job

if __name__ == "__main__":
    workshops = zones_df(["workshop"])
    run_job(
        "q5",
        lambda spark: (lambda df: q5_battery_monitoring(df, workshops)),
        battery_events,
        __doc__,
    )
