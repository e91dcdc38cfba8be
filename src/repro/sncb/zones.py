"""Geofence zones derived from the rail network.

All zones are rectangles or circles so zone containment is expressible
in plain DuckDB SQL (the oracle contract in DESIGN.md); the general
polygon path of the MEOS kernel is covered by its own unit tests.

Zone kinds (mirroring the paper's §3.1/§3.2 use cases):

* ``station``       — platform area around each station (Q6, Q7)
* ``workshop``      — maintenance workshops near three hub stations (Q5, Q7)
* ``maintenance``   — temporary work zones straddling the track (Q1)
* ``curve``         — high-risk segments with a speed limit (Q3)
* ``neighbourhood`` — noise-sensitive urban areas (Q2)

The zones are placed *on the routes* (at fixed arc-length fractions) so
trains deterministically traverse them — giving queries a controllable,
non-zero selectivity.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.meos.geometry import Circle, Rect
from repro.sncb.network import (
    ROUTES,
    point_at_arclength,
    route_length,
    route_polyline,
    stations,
)

STATION_RADIUS_M = 500.0
WORKSHOP_RADIUS_M = 300.0

# (route, arc fraction, half-size metres) for rectangular track zones.
_MAINTENANCE_SPECS = [("R1", 0.35, 1500.0), ("R2", 0.55, 1500.0), ("R3", 0.40, 1500.0)]
_CURVE_SPECS = [
    ("R1", 0.20, 1000.0, 60.0),
    ("R1", 0.60, 1000.0, 80.0),
    ("R2", 0.30, 1000.0, 60.0),
    ("R3", 0.70, 1000.0, 80.0),
]
# Workshops sit 2 km east of these hub stations.
_WORKSHOP_STATIONS = [3, 6, 5]  # Brussels, Antwerp, Liège
# Noise-sensitive neighbourhoods around these stations (half-size m).
_NEIGHBOURHOOD_STATIONS = [(3, 2000.0), (2, 2000.0), (6, 2000.0)]

_COLUMNS = [
    "zone_id", "kind", "name", "shape",
    "xmin", "ymin", "xmax", "ymax", "cx", "cy", "r",
    "speed_limit_kmh",
]


def _circle_row(zid, kind, name, cx, cy, r, limit=np.nan):
    return dict(
        zone_id=zid, kind=kind, name=name, shape="circle",
        xmin=cx - r, ymin=cy - r, xmax=cx + r, ymax=cy + r,
        cx=cx, cy=cy, r=r, speed_limit_kmh=limit,
    )


def _rect_row(zid, kind, name, cx, cy, half, limit=np.nan):
    return dict(
        zone_id=zid, kind=kind, name=name, shape="rect",
        xmin=cx - half, ymin=cy - half, xmax=cx + half, ymax=cy + half,
        cx=cx, cy=cy, r=np.nan, speed_limit_kmh=limit,
    )


def _route_point(route: str, frac: float) -> tuple[float, float]:
    poly = route_polyline(route)
    x, y = point_at_arclength(poly, np.array([frac * route_length(route)]))
    return float(x[0]), float(y[0])


def zones_df(kinds: list[str] | None = None) -> pd.DataFrame:
    """All zones as a flat, SQL-friendly DataFrame.

    Circle rows also carry their bounding box in xmin…ymax (useful for
    cheap SQL pruning); rect rows carry their centre in cx/cy.
    """
    rows: list[dict] = []
    zid = 0
    for s in stations():
        rows.append(_circle_row(zid, "station", s.name, s.x, s.y, STATION_RADIUS_M))
        zid += 1
    for sid in _WORKSHOP_STATIONS:
        s = stations()[sid]
        rows.append(
            _circle_row(zid, "workshop", f"{s.name}-workshop",
                        s.x + 2000.0, s.y, WORKSHOP_RADIUS_M)
        )
        zid += 1
    for route, frac, half in _MAINTENANCE_SPECS:
        cx, cy = _route_point(route, frac)
        rows.append(_rect_row(zid, "maintenance", f"{route}-mnt-{int(frac*100)}", cx, cy, half))
        zid += 1
    for route, frac, half, limit in _CURVE_SPECS:
        cx, cy = _route_point(route, frac)
        rows.append(
            _rect_row(zid, "curve", f"{route}-curve-{int(frac*100)}", cx, cy, half, limit)
        )
        zid += 1
    for sid, half in _NEIGHBOURHOOD_STATIONS:
        s = stations()[sid]
        rows.append(_rect_row(zid, "neighbourhood", f"{s.name}-nbhd", s.x, s.y, half))
        zid += 1
    df = pd.DataFrame(rows, columns=_COLUMNS)
    if kinds is not None:
        df = df[df["kind"].isin(kinds)].reset_index(drop=True)
    return df


def shapes_from_df(df: pd.DataFrame) -> tuple[list, list[int]]:
    """Materialise geometry objects (Rect/Circle) + ids from a zone
    frame — the form the vectorised MEOS kernels consume."""
    shapes, ids = [], []
    for row in df.itertuples(index=False):
        if row.shape == "circle":
            shapes.append(Circle(float(row.cx), float(row.cy), float(row.r)))
        elif row.shape == "rect":
            shapes.append(Rect(float(row.xmin), float(row.ymin), float(row.xmax), float(row.ymax)))
        else:  # pragma: no cover - schema guard
            raise ValueError(f"unknown shape {row.shape!r}")
        ids.append(int(row.zone_id))
    return shapes, ids


def zone_id_sql_case(df: pd.DataFrame, x: str = "x", y: str = "y") -> str:
    """A DuckDB CASE expression returning the id of the first zone in
    ``df`` containing point (x, y), or −1 — the oracle-side mirror of
    ``vectorized.zone_id_at`` (same first-match-wins order)."""
    whens = []
    for row in df.itertuples(index=False):
        if row.shape == "rect":
            cond = (
                f"({x} >= {row.xmin!r} AND {x} <= {row.xmax!r} "
                f"AND {y} >= {row.ymin!r} AND {y} <= {row.ymax!r})"
            )
        else:
            cond = (
                f"(sqrt(({x} - {row.cx!r})*({x} - {row.cx!r}) + "
                f"({y} - {row.cy!r})*({y} - {row.cy!r})) <= {row.r!r})"
            )
        whens.append(f"WHEN {cond} THEN {int(row.zone_id)}")
    if not whens:
        return "-1"
    return "CASE " + " ".join(whens) + " ELSE -1 END"


def zones_sql_predicate(df: pd.DataFrame, x: str = "x", y: str = "y") -> str:
    """A DuckDB boolean expression: point (x, y) inside ANY zone of
    ``df`` — the oracle-side mirror of ``vectorized.in_any_zone``."""
    terms = []
    for row in df.itertuples(index=False):
        if row.shape == "rect":
            terms.append(
                f"({x} >= {row.xmin!r} AND {x} <= {row.xmax!r} "
                f"AND {y} >= {row.ymin!r} AND {y} <= {row.ymax!r})"
            )
        else:
            terms.append(
                f"(sqrt(({x} - {row.cx!r})*({x} - {row.cx!r}) + "
                f"({y} - {row.cy!r})*({y} - {row.cy!r})) <= {row.r!r})"
            )
    return "(" + " OR ".join(terms) + ")" if terms else "FALSE"
