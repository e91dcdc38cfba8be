"""Q8 — brake monitoring: emergency clusters + persistent low pressure
(paper §3.2).

    spark-submit jobs/q8_brake_monitoring.py [--duration-s 3600]
"""
from repro.core.queries import q8_emergency_clusters, q8_low_pressure
from repro.sncb.events import brake_events

from _common import get_spark, stream_args

if __name__ == "__main__":
    args = stream_args(__doc__)
    spark = get_spark("nebulameos-q8")
    pdf = brake_events(duration_s=args.duration_s, dt=args.dt, seed=args.seed)
    df = spark.createDataFrame(pdf).cache()
    clusters = q8_emergency_clusters(df)
    low = q8_low_pressure(df)
    print(f"[q8] input events: {len(pdf):,}")
    print(f"[q8a] emergency-cluster windows: {clusters.count():,} "
          f"(alerts: {clusters.filter('alert').count():,})")
    clusters.orderBy("w_start_s").show(args.show)
    print(f"[q8b] persistent low-pressure runs: {low.count():,}")
    low.orderBy("train_id", "w_start").show(args.show)
    spark.stop()
