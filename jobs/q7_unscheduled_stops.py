"""Q7 — unscheduled stop detection (paper §3.2).

    spark-submit jobs/q7_unscheduled_stops.py [--duration-s 3600]
"""
from repro.core.queries import q7_unscheduled_stops
from repro.sncb.events import stop_events
from repro.sncb.zones import zones_df

from _common import run_job

if __name__ == "__main__":
    allowed = zones_df(["station", "workshop"])
    run_job(
        "q7",
        lambda spark: (lambda df: q7_unscheduled_stops(df, allowed, min_stop_s=90.0)),
        lambda **kw: stop_events(**kw).drop(columns=["dwell"]),
        __doc__,
    )
