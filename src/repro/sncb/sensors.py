"""Per-channel sensor models over a simulated trajectory.

Each generator takes the trajectory frame from ``trains.simulate_train``
/ ``trains.fleet`` and appends sensor columns, deterministically in
``seed``. Fault injection is parameterised per train so query
selectivities (battery deviation alerts, emergency-brake clusters,
overcrowding) are controllable ground truth.

Channel models (substitutes for the proprietary SNCB feeds):

* **battery** — voltage follows a sawtooth charge/discharge reference
  curve (2 h discharge 27.5→24.5 V, 1 h charge back); faulty trains
  drift below the curve; overheating trains get temperature spikes.
* **brakes** — brake-pipe pressure ~5 bar released, dropping with
  deceleration; emergency brakes (< 1.5 bar) are injected inside one
  designated *hot segment* per route (Q8's "specific track segments");
  a low-pressure fault caps a train's released pressure at 4.2 bar.
* **noise** — outside noise grows with speed plus random squeal bursts.
* **passengers** — boarding/alighting at station dwells with a
  per-train demand level; occupancy is carried forward between stops.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.meos.vectorized import run_lengths

# ---- battery reference curve (Q5) -----------------------------------
BATTERY_PERIOD_S = 10_800.0       # 3 h cycle
BATTERY_DISCHARGE_S = 7_200.0     # first 2 h discharging
BATTERY_V_FULL = 27.5
BATTERY_V_EMPTY = 24.5
BATTERY_TEMP_BASE_C = 24.0
OVERHEAT_THRESHOLD_C = 55.0
DEVIATION_THRESHOLD_V = 0.8      # |measured − expected| above this → alert

SEAT_CAPACITY = 300
EMERGENCY_BAR = 1.5
LOW_PRESSURE_BAR = 4.5
#: Per-route hot segment for emergency-brake clusters, as canonical
#: arc-length fractions (start, end).
BRAKE_HOT_SEGMENT = (0.45, 0.55)


def expected_battery_voltage(ts_rel: np.ndarray) -> np.ndarray:
    """Reference voltage at seconds-since-cycle-start ``ts_rel`` — the
    "predefined curve" of Query 5."""
    phase = np.asarray(ts_rel, dtype=np.float64) % BATTERY_PERIOD_S
    discharging = phase < BATTERY_DISCHARGE_S
    v_dis = BATTERY_V_FULL - (BATTERY_V_FULL - BATTERY_V_EMPTY) * phase / BATTERY_DISCHARGE_S
    v_chg = BATTERY_V_EMPTY + (BATTERY_V_FULL - BATTERY_V_EMPTY) * (
        phase - BATTERY_DISCHARGE_S
    ) / (BATTERY_PERIOD_S - BATTERY_DISCHARGE_S)
    return np.where(discharging, v_dis, v_chg)


def battery(
    df: pd.DataFrame,
    *,
    seed: int = 0,
    fault_trains: tuple[int, ...] = (1,),
    fault_after_frac: float = 0.5,
    fault_drift_v: float = -1.2,
    overheat_trains: tuple[int, ...] = (2,),
    noise_v: float = 0.05,
) -> pd.DataFrame:
    """Append battery_v, battery_expected_v, battery_dev_v, charging,
    battery_temp_c columns."""
    out = df.copy()
    rng = np.random.default_rng(seed + 11)
    ts_rel = out["ts"].to_numpy() - out["ts"].min()
    expected = expected_battery_voltage(ts_rel)
    measured = expected + rng.normal(0.0, noise_v, len(out))

    t_span = ts_rel.max() if len(out) else 0.0
    fault_start = fault_after_frac * t_span
    for tid in fault_trains:
        m = (out["train_id"].to_numpy() == tid) & (ts_rel >= fault_start)
        # Drift linearly to the full offset over 600 s, then hold.
        ramp = np.clip((ts_rel - fault_start) / 600.0, 0.0, 1.0)
        measured = np.where(m, measured + fault_drift_v * ramp, measured)

    phase = ts_rel % BATTERY_PERIOD_S
    charging = phase >= BATTERY_DISCHARGE_S
    # Temperature: warmer while charging, plus injected overheat spikes.
    temp = (
        BATTERY_TEMP_BASE_C
        + 6.0 * charging.astype(np.float64)
        + rng.normal(0.0, 0.5, len(out))
    )
    for tid in overheat_trains:
        m = out["train_id"].to_numpy() == tid
        # Overheat burst in the middle third of the simulation.
        burst = (ts_rel > t_span / 3) & (ts_rel < t_span / 2)
        temp = np.where(m & burst, temp + 35.0, temp)

    out["battery_expected_v"] = expected
    out["battery_v"] = measured
    out["battery_dev_v"] = measured - expected
    out["charging"] = charging
    out["battery_temp_c"] = temp
    return out


def brakes(
    df: pd.DataFrame,
    *,
    seed: int = 0,
    emergency_trains: tuple[int, ...] = (0, 3),
    n_emergency_per_pass: int = 3,
    lowpressure_trains: tuple[int, ...] = (5,),
    accel_ref: float = 0.5,
    noise_bar: float = 0.05,
) -> pd.DataFrame:
    """Append brake_bar, braking, is_emergency, in_hot_segment columns.

    Emergency brakes are injected when an ``emergency_train`` crosses
    its route's hot segment: ``n_emergency_per_pass`` short (~3 s)
    pressure collapses per crossing — the repeated-emergency pattern Q8
    must detect. ``lowpressure_trains`` have released pressure capped at
    4.2 bar (the persistent-low-pressure fault).
    """
    out = df.copy().sort_values(["train_id", "ts"]).reset_index(drop=True)
    rng = np.random.default_rng(seed + 23)
    n = len(out)
    pressure = np.empty(n)
    is_em = np.zeros(n, dtype=bool)
    in_hot = np.zeros(n, dtype=bool)

    # Route length per row to turn s_route into a fraction.
    from repro.sncb.network import route_length  # local import: avoid cycle

    rlen = out["route"].map({r: route_length(r) for r in out["route"].unique()}).to_numpy()
    frac = out["s_route"].to_numpy() / rlen
    in_hot = (frac >= BRAKE_HOT_SEGMENT[0]) & (frac <= BRAKE_HOT_SEGMENT[1])

    for tid, idx in out.groupby("train_id").indices.items():
        v = out["speed_ms"].to_numpy()[idx]
        t = out["ts"].to_numpy()[idx]
        decel = np.zeros(len(idx))
        if len(idx) > 1:
            dv = np.diff(v) / np.diff(t)
            decel[1:] = np.maximum(-dv, 0.0)
        intensity = np.clip(decel / accel_ref, 0.0, 1.0)
        p = 5.0 - 3.0 * intensity + rng.normal(0.0, noise_bar, len(idx))
        if tid in lowpressure_trains:
            p = np.minimum(p, 4.2 + rng.normal(0.0, noise_bar / 2, len(idx)))
        if tid in emergency_trains:
            hot = in_hot[idx]
            starts, ends, _ = run_lengths(hot)
            for s0, e0 in zip(starts, ends):
                # Pick n_emergency moments inside this crossing.
                span = e0 - s0
                if span < 10:
                    continue
                picks = rng.choice(
                    np.arange(s0 + 2, e0 - 2), size=min(n_emergency_per_pass, span // 4),
                    replace=False,
                )
                for pk in picks:
                    dur = int(rng.integers(2, 5))
                    p[pk : pk + dur] = rng.uniform(0.4, 1.0, min(dur, len(idx) - pk))
                    is_em[idx[pk : pk + dur]] = True
        pressure[idx] = p
    out["brake_bar"] = pressure
    out["braking"] = out.groupby("train_id")["speed_ms"].diff().fillna(0.0).to_numpy() < -1e-9
    out["is_emergency"] = is_em
    out["in_hot_segment"] = in_hot
    return out


def noise(
    df: pd.DataFrame,
    *,
    seed: int = 0,
    base_db: float = 42.0,
    speed_gain_db: float = 28.0,
    vmax_ms: float = 33.3,
    squeal_prob: float = 0.01,
    squeal_db: float = 9.0,
) -> pd.DataFrame:
    """Append noise_db: speed-correlated with random squeal bursts."""
    out = df.copy()
    rng = np.random.default_rng(seed + 37)
    v = out["speed_ms"].to_numpy()
    squeal = rng.random(len(out)) < squeal_prob
    out["noise_db"] = (
        base_db
        + speed_gain_db * np.clip(v / vmax_ms, 0.0, 1.0)
        + squeal * squeal_db
        + rng.normal(0.0, 1.5, len(out))
    )
    return out


def passengers(
    df: pd.DataFrame,
    *,
    seed: int = 0,
    capacity: int = SEAT_CAPACITY,
    demand_per_train: dict[int, float] | None = None,
) -> pd.DataFrame:
    """Append onboard / boarded / alighted / capacity columns.

    Boarding happens at the first tick of each station dwell; occupancy
    is carried forward elsewhere. ``demand_per_train`` scales mean
    boardings (default gives train 0 heavy demand so Q6 fires).
    """
    demand = {0: 140.0, 1: 60.0, 2: 80.0, 3: 40.0, 4: 55.0, 5: 35.0}
    if demand_per_train:
        demand.update(demand_per_train)
    out = df.copy().sort_values(["train_id", "ts"]).reset_index(drop=True)
    rng = np.random.default_rng(seed + 53)
    onboard = np.zeros(len(out), dtype=np.int64)
    boarded = np.zeros(len(out), dtype=np.int64)
    alighted = np.zeros(len(out), dtype=np.int64)
    for tid, idx in out.groupby("train_id").indices.items():
        dwell = (out["dwell"].to_numpy()[idx] == "station")
        starts, _, _ = run_lengths(dwell)
        cur = 0
        lam = demand.get(int(tid), 50.0)
        stop_events = {}
        for s0 in starts:
            al = rng.binomial(cur, 0.35) if cur > 0 else 0
            bd = int(rng.poisson(lam))
            cur = cur - al + bd  # may exceed seat capacity → standing load
            stop_events[s0] = (bd, al, cur)
        cur = 0
        ptr = 0
        keys = sorted(stop_events)
        vals = np.zeros(len(idx), dtype=np.int64)
        bvals = np.zeros(len(idx), dtype=np.int64)
        avals = np.zeros(len(idx), dtype=np.int64)
        for j in range(len(idx)):
            if ptr < len(keys) and j == keys[ptr]:
                bd, al, cur = stop_events[keys[ptr]]
                bvals[j], avals[j] = bd, al
                ptr += 1
            vals[j] = cur
        onboard[idx] = vals
        boarded[idx] = bvals
        alighted[idx] = avals
    out["onboard"] = onboard
    out["boarded"] = boarded
    out["alighted"] = alighted
    out["capacity"] = np.int64(capacity)
    out["occupancy"] = out["onboard"] / float(capacity)
    return out


def alerts(
    df: pd.DataFrame,
    *,
    seed: int = 0,
    speeding_over_kmh: float = 115.0,
    malfunction_prob: float = 0.002,
) -> pd.DataFrame:
    """Append alert_kind ("" | "speeding" | "malfunction") and
    alert_essential for Q1. Speeding alerts fire above the cruise
    threshold; malfunctions are rare random events and always essential.
    """
    out = df.copy()
    rng = np.random.default_rng(seed + 71)
    speeding = out["speed_kmh"].to_numpy() > speeding_over_kmh
    malfunction = rng.random(len(out)) < malfunction_prob
    kind = np.where(malfunction, "malfunction", np.where(speeding, "speeding", ""))
    out["alert_kind"] = kind
    out["alert_essential"] = malfunction  # speeding is non-essential
    return out
