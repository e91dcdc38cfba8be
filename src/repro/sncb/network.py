"""Synthetic Belgian rail network: stations, routes, train assignment.

Twelve stations at (approximately) the real coordinates of Belgian
cities, projected to planar metres (`meos.geometry.project_equirect`).
Three routes (east–west main line, north–south line, and a diagonal)
connect them with straight track segments; six trains run the routes in
pairs, one per direction — mirroring the paper's six instrumented
trains.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.meos.geometry import project_equirect

# (name, lon, lat) — approximate city-centre coordinates.
_STATIONS = [
    ("Ostend", 2.9125, 51.2289),
    ("Bruges", 3.2247, 51.2093),
    ("Ghent", 3.7174, 51.0543),
    ("Brussels", 4.3517, 50.8466),
    ("Leuven", 4.7009, 50.8796),
    ("Liege", 5.5797, 50.6337),
    ("Antwerp", 4.4025, 51.2194),
    ("Mechelen", 4.4800, 51.0259),
    ("Charleroi", 4.4446, 50.4108),
    ("Mons", 3.9523, 50.4542),
    ("Hasselt", 5.3378, 50.9305),
    ("Namur", 4.8670, 50.4674),
]

# Routes as ordered station-id sequences.
ROUTES: dict[str, list[int]] = {
    "R1": [0, 1, 2, 3, 4, 5],     # Ostend → Liège (east–west main)
    "R2": [6, 7, 3, 8],           # Antwerp → Charleroi (north–south)
    "R3": [9, 3, 4, 10],          # Mons → Hasselt (diagonal)
}

N_TRAINS = 6

# train_id → (route, direction): two trains per route, opposite ways.
TRAIN_ASSIGNMENT: dict[int, tuple[str, int]] = {
    0: ("R1", +1),
    1: ("R1", -1),
    2: ("R2", +1),
    3: ("R2", -1),
    4: ("R3", +1),
    5: ("R3", -1),
}


@dataclass(frozen=True)
class Station:
    """A station: id, name, planar position (metres)."""

    station_id: int
    name: str
    x: float
    y: float


def stations() -> list[Station]:
    """All stations with projected planar coordinates."""
    lons = np.array([s[1] for s in _STATIONS])
    lats = np.array([s[2] for s in _STATIONS])
    xs, ys = project_equirect(lons, lats)
    return [
        Station(i, _STATIONS[i][0], float(xs[i]), float(ys[i]))
        for i in range(len(_STATIONS))
    ]


def stations_df() -> pd.DataFrame:
    """Stations as a DataFrame (station_id, name, x, y)."""
    return pd.DataFrame([s.__dict__ for s in stations()])


def route_polyline(route: str, direction: int = +1) -> np.ndarray:
    """(N, 2) polyline of station positions along ``route``; reversed
    when ``direction`` is −1."""
    ss = stations()
    ids = ROUTES[route]
    if direction < 0:
        ids = ids[::-1]
    return np.array([[ss[i].x, ss[i].y] for i in ids])


def route_station_ids(route: str, direction: int = +1) -> list[int]:
    ids = ROUTES[route]
    return ids[::-1] if direction < 0 else list(ids)


def cum_arclength(poly: np.ndarray) -> np.ndarray:
    """Cumulative arc length (metres) at each polyline vertex; [0] = 0."""
    seg = np.hypot(np.diff(poly[:, 0]), np.diff(poly[:, 1]))
    return np.concatenate(([0.0], np.cumsum(seg)))


def point_at_arclength(poly: np.ndarray, s: np.ndarray) -> tuple[np.ndarray, np.ndarray]:
    """Interpolated (x, y) at arc length(s) ``s`` along ``poly``
    (clamped to the polyline extent)."""
    cum = cum_arclength(poly)
    s = np.clip(np.asarray(s, dtype=np.float64), 0.0, cum[-1])
    x = np.interp(s, cum, poly[:, 0])
    y = np.interp(s, cum, poly[:, 1])
    return x, y


def route_length(route: str) -> float:
    """Total route length in metres."""
    return float(cum_arclength(route_polyline(route))[-1])
