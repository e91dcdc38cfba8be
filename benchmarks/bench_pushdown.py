"""Table 1b — operator push-down uplink savings (qualitative in §1/§3.2).

The paper's motivation: devices currently "send raw data to the cloud";
NebulaMEOS "push[es] down computation to IoT devices". This bench
quantifies that on our substrate: it times the *edge-resident* operator
prefix (the geofence filter / stop detector that would run on-train)
and records, via the topology model, the uplink bytes under
cloud-placement vs push-down placement, using selectivities measured on
the real stream.
"""
import numpy as np
import pytest

from repro.meos.vectorized import in_any_zone, run_lengths
from repro.nebula.topology import Operator, place, transfer_bytes
from repro.sncb.events import event_size_for_query, geofence_events, stop_events
from repro.sncb.zones import shapes_from_df, zones_df


@pytest.fixture(scope="module")
def geofence_stream():
    return geofence_events(duration_s=3600.0, dt=0.5, seed=0)


@pytest.fixture(scope="module")
def stop_stream():
    return stop_events(duration_s=3600.0, dt=0.5, seed=0)


def test_pushdown_q1_alert_filter(benchmark, geofence_stream):
    """Edge-side Q1 filter (alert rows surviving maintenance-zone
    suppression) — the pushable prefix of the Q1 chain."""
    shapes, _ = shapes_from_df(zones_df(["maintenance"]))
    x = geofence_stream["x"].to_numpy()
    y = geofence_stream["y"].to_numpy()
    is_alert = (geofence_stream["alert_kind"] != "").to_numpy()
    essential = geofence_stream["alert_essential"].to_numpy()

    def edge_filter():
        in_mnt = in_any_zone(x, y, shapes)
        return int((is_alert & (essential | ~in_mnt)).sum())

    survivors = benchmark(edge_filter)
    n = len(geofence_stream)
    sel = survivors / n
    ops = [Operator("q1_edge_filter", selectivity=sel)]
    size = event_size_for_query("q1")
    cloud = transfer_bytes(ops, place(ops, "cloud"), n_events=n, event_size=size)
    push = transfer_bytes(ops, place(ops, "pushdown"), n_events=n, event_size=size)
    assert push.bytes_shipped < cloud.bytes_shipped
    benchmark.extra_info.update(
        {
            "n_events": n,
            "selectivity": round(sel, 5),
            "uplink_bytes_cloud": cloud.bytes_shipped,
            "uplink_bytes_pushdown": push.bytes_shipped,
            "savings_frac": round(push.savings_frac, 4),
        }
    )


def test_pushdown_q7_stop_windows(benchmark, stop_stream):
    """Edge-side Q7 stop detection: raw 1–2 Hz positions reduce to a
    handful of stop-window records — the largest uplink reduction."""
    WINDOW_RECORD_B = 64  # train, bounds, duration, position, flag

    def edge_detect():
        total = 0
        for _, g in stop_stream.groupby("train_id", sort=False):
            flag = (g["speed_ms"].to_numpy() < 0.5)
            ts = g["ts"].to_numpy()
            s, e, _ = run_lengths(flag)
            total += int(np.sum(ts[e - 1] - ts[s] >= 60.0))
        return total

    n_windows = benchmark(edge_detect)
    n = len(stop_stream)
    sel = n_windows / n
    size = event_size_for_query("q7")
    ops = [Operator("q7_stop_windows", selectivity=sel, out_event_size=WINDOW_RECORD_B)]
    cloud = transfer_bytes(ops, place(ops, "cloud"), n_events=n, event_size=size)
    push = transfer_bytes(ops, place(ops, "pushdown"), n_events=n, event_size=size)
    assert push.savings_frac > 0.99  # windows ≪ raw events
    benchmark.extra_info.update(
        {
            "n_events": n,
            "n_windows": n_windows,
            "uplink_bytes_cloud": cloud.bytes_shipped,
            "uplink_bytes_pushdown": push.bytes_shipped,
            "savings_frac": round(push.savings_frac, 6),
        }
    )
