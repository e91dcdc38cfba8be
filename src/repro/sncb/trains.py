"""Kinematic train motion simulation along the synthetic network.

Each train shuttles along its assigned route with a trapezoidal speed
profile per leg (accelerate – cruise – decelerate), dwells at stations,
and occasionally performs an *unscheduled stop* mid-leg (the ground
truth for Query 7). The simulation is deterministic in ``seed``.

Output is a 1 Hz (configurable) pandas frame per train with position in
planar metres and lon/lat, instantaneous speed, dwell bookkeeping, and
the canonical arc-length position along the route (used by the brake
fault injector to localise faults to track segments).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.meos.geometry import unproject_equirect
from repro.sncb.network import (
    TRAIN_ASSIGNMENT,
    cum_arclength,
    point_at_arclength,
    route_polyline,
    route_station_ids,
)

#: Simulation epoch: 2024-01-01 00:00:00 UTC.
T0_EPOCH = 1_704_067_200.0

DEFAULT_VMAX_MS = 33.3          # ~120 km/h cruise
DEFAULT_ACCEL_MS2 = 0.5
DEFAULT_STATION_DWELL_S = 60.0


@dataclass
class _Phase:
    """One simulation phase: either a moving sub-leg or a dwell."""

    kind: str          # "move" | "station" | "unscheduled"
    duration: float
    s_start: float     # arc length at phase start (traversal direction)
    s_end: float
    leg: int
    station_id: int    # only for kind == "station"
    vmax: float = DEFAULT_VMAX_MS  # cruise ceiling for this leg


#: Per-leg cruise-speed factors: not every leg is run at line speed
#: (timetabling, track class) — this also makes "speeding" a property
#: of specific legs rather than of all cruising (Q1 selectivity).
_LEG_SPEED_FACTORS = (0.83, 0.92, 1.0)


def _trapezoid(L: float, vmax: float, a: float) -> tuple[float, float, float]:
    """(vpeak, t_acc, T_total) of a stop-to-stop trapezoidal profile
    covering distance ``L``."""
    vpeak = min(vmax, np.sqrt(a * L))
    t_acc = vpeak / a
    d_acc = vpeak * vpeak / (2 * a)
    t_cruise = max(L - 2 * d_acc, 0.0) / vpeak if vpeak > 0 else 0.0
    return vpeak, t_acc, 2 * t_acc + t_cruise


def _sample_move(tau: np.ndarray, L: float, vmax: float, a: float) -> tuple[np.ndarray, np.ndarray]:
    """Distance and speed at phase-local times ``tau`` of the profile."""
    vpeak, t_acc, T = _trapezoid(L, vmax, a)
    t_dec = T - t_acc
    s = np.where(
        tau < t_acc,
        0.5 * a * tau**2,
        np.where(
            tau < t_dec,
            0.5 * a * t_acc**2 + vpeak * (tau - t_acc),
            L - 0.5 * a * np.maximum(T - tau, 0.0) ** 2,
        ),
    )
    v = np.where(tau < t_acc, a * tau, np.where(tau < t_dec, vpeak, a * np.maximum(T - tau, 0.0)))
    return np.clip(s, 0.0, L), np.maximum(v, 0.0)


def _build_phases(
    train_id: int,
    duration_s: float,
    rng: np.random.Generator,
    *,
    vmax: float,
    accel: float,
    station_dwell: float,
    unscheduled_prob: float,
    unscheduled_dwell: tuple[float, float],
) -> tuple[list[_Phase], str, int, float]:
    route, direction = TRAIN_ASSIGNMENT[train_id]
    poly = route_polyline(route, direction)
    sids = route_station_ids(route, direction)
    cum = cum_arclength(poly)
    total_len = float(cum[-1])

    phases: list[_Phase] = []
    t_acc = 0.0
    leg_counter = 0
    while t_acc < duration_s:
        # Dwell at the departure station of this traversal.
        phases.append(_Phase("station", station_dwell, 0.0, 0.0, leg_counter, sids[0]))
        t_acc += station_dwell
        for i in range(len(poly) - 1):
            s0, s1 = float(cum[i]), float(cum[i + 1])
            L = s1 - s0
            leg_vmax = vmax * float(rng.choice(_LEG_SPEED_FACTORS))
            stops = [(s1, "station")]
            if rng.random() < unscheduled_prob:
                su = s0 + rng.uniform(0.25, 0.75) * L
                stops.insert(0, (su, "unscheduled"))
            prev = s0
            for s_stop, kind in stops:
                seg_len = s_stop - prev
                _, _, T = _trapezoid(seg_len, leg_vmax, accel)
                phases.append(
                    _Phase("move", T, prev, s_stop, leg_counter, -1, leg_vmax)
                )
                t_acc += T
                if kind == "unscheduled":
                    d = rng.uniform(*unscheduled_dwell)
                    phases.append(_Phase("unscheduled", d, s_stop, s_stop, leg_counter, -1))
                    t_acc += d
                else:
                    phases.append(
                        _Phase("station", station_dwell, s_stop, s_stop, leg_counter, sids[i + 1])
                    )
                    t_acc += station_dwell
                prev = s_stop
            leg_counter += 1
            if t_acc >= duration_s:
                break
        # Shuttle back: reverse traversal on the next loop iteration.
        poly = poly[::-1].copy()
        sids = sids[::-1]
        cum = cum_arclength(poly)
    return phases, route, direction, total_len


def simulate_train(
    train_id: int,
    *,
    duration_s: float = 3600.0,
    dt: float = 1.0,
    t0: float = T0_EPOCH,
    seed: int = 0,
    vmax_ms: float = DEFAULT_VMAX_MS,
    accel_ms2: float = DEFAULT_ACCEL_MS2,
    station_dwell_s: float = DEFAULT_STATION_DWELL_S,
    unscheduled_prob: float = 0.25,
    unscheduled_dwell_s: tuple[float, float] = (120.0, 300.0),
) -> pd.DataFrame:
    """Simulate one train for ``duration_s`` seconds sampled every ``dt``.

    Columns: train_id, ts (epoch s), x, y (m), lon, lat, speed_ms,
    speed_kmh, dwell ("" | "station" | "unscheduled"), station_id (−1
    outside stations), leg, s_route (canonical arc length), route,
    direction.
    """
    if train_id not in TRAIN_ASSIGNMENT:
        raise ValueError(f"unknown train {train_id}")
    if duration_s <= 0 or dt <= 0:
        raise ValueError("duration_s and dt must be positive")
    rng = np.random.default_rng(seed * 1009 + train_id)
    phases, route, direction, total_len = _build_phases(
        train_id, duration_s, rng,
        vmax=vmax_ms, accel=accel_ms2, station_dwell=station_dwell_s,
        unscheduled_prob=unscheduled_prob, unscheduled_dwell=unscheduled_dwell_s,
    )

    # Phase start offsets; sample the global dt grid within each phase.
    frames: list[pd.DataFrame] = []
    t_cursor = 0.0
    # Track which traversal we are in to map traversal-s → canonical-s.
    fwd = direction > 0
    traversal = 0
    poly_f = route_polyline(route, direction)
    last_leg = -1
    for ph in phases:
        if t_cursor >= duration_s:
            break
        # New traversal starts when leg counter wraps to a fresh dwell
        # at s == 0 after having moved (detected via leg discontinuity).
        t_start, t_end = t_cursor, min(t_cursor + ph.duration, duration_s)
        t_cursor += ph.duration
        first_tick = np.ceil(t_start / dt) * dt
        local = np.arange(first_tick, t_end, dt) - t_start
        if local.size == 0:
            continue
        if ph.kind == "move":
            s_rel, v = _sample_move(local, ph.s_end - ph.s_start, ph.vmax, accel_ms2)
            s_trav = ph.s_start + s_rel
        else:
            s_trav = np.full(local.size, ph.s_start)
            v = np.zeros(local.size)
        n_legs = len(route_polyline(route)) - 1
        traversal = ph.leg // n_legs
        leg_in_route = ph.leg % n_legs
        # Even traversals follow the initial direction; odd are reversed.
        fwd_now = fwd if traversal % 2 == 0 else not fwd
        s_canon = s_trav if fwd_now else total_len - s_trav
        poly_now = poly_f if traversal % 2 == 0 else poly_f[::-1]
        x, y = point_at_arclength(poly_now, s_trav)
        frames.append(
            pd.DataFrame(
                {
                    "train_id": np.int32(train_id),
                    "ts": t0 + t_start + local,
                    "x": x,
                    "y": y,
                    "speed_ms": v,
                    "dwell": ph.kind if ph.kind != "move" else "",
                    "station_id": np.int32(ph.station_id if ph.kind == "station" else -1),
                    "leg": np.int32(leg_in_route),
                    "s_route": s_canon,
                }
            )
        )
        last_leg = ph.leg
    del last_leg
    df = pd.concat(frames, ignore_index=True)
    df = df[df["ts"] < t0 + duration_s].reset_index(drop=True)
    lon, lat = unproject_equirect(df["x"].to_numpy(), df["y"].to_numpy())
    df["lon"], df["lat"] = lon, lat
    df["speed_kmh"] = df["speed_ms"] * 3.6
    df["route"] = route
    df["direction"] = np.int32(direction)
    df["t"] = pd.to_datetime(df["ts"], unit="s")
    return df


def fleet(
    *,
    duration_s: float = 3600.0,
    dt: float = 1.0,
    t0: float = T0_EPOCH,
    seed: int = 0,
    **kwargs,
) -> pd.DataFrame:
    """All six trains concatenated, sorted by (train_id, ts)."""
    parts = [
        simulate_train(i, duration_s=duration_s, dt=dt, t0=t0, seed=seed, **kwargs)
        for i in TRAIN_ASSIGNMENT
    ]
    return pd.concat(parts, ignore_index=True)
