"""Q6 — heavy passenger load + extra-train suggestion (paper §3.2).

    spark-submit jobs/q6_heavy_passenger_load.py [--duration-s 3600]
"""
from repro.core.queries import q6_extra_train_suggestion, q6_heavy_passenger_load
from repro.sncb.events import passenger_events

from _common import get_spark, stream_args

if __name__ == "__main__":
    args = stream_args(__doc__)
    spark = get_spark("nebulameos-q6")
    pdf = passenger_events(duration_s=args.duration_s, dt=args.dt, seed=args.seed)
    windows = q6_heavy_passenger_load(spark.createDataFrame(pdf))
    print(f"[q6] input events: {len(pdf):,}  windows: {windows.count():,}")
    windows.orderBy("w_start_s", "train_id").show(args.show)
    print("[q6] per-train extra-train suggestion:")
    q6_extra_train_suggestion(windows).orderBy("train_id").show()
    spark.stop()
