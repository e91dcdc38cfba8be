"""Planar geometry primitives for the MEOS substitute.

All distance computations are planar (metres) over an equirectangular
projection centred on Belgium — adequate at the ~300 km extent of the
SNCB network (worst-case distortion ~2% for cross-country pairs,
far less for consecutive GPS fixes), and the same simplification
the DuckDB oracle can express in plain SQL. ``haversine_m`` is provided
for tests that want a geodetic reference.

Everything is numpy-vectorised over *arrays of points* so the MEOS
kernels can run inside Arrow UDF batches without Python-level loops.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

# Projection origin: roughly the centroid of Belgium.
LON0 = 4.45
LAT0 = 50.5
EARTH_R_M = 6_371_008.8


def project_equirect(
    lon: np.ndarray, lat: np.ndarray, *, lon0: float = LON0, lat0: float = LAT0
) -> tuple[np.ndarray, np.ndarray]:
    """Project lon/lat degrees to planar metres (equirectangular).

    x grows east, y grows north; (lon0, lat0) maps to (0, 0).
    """
    lon = np.asarray(lon, dtype=np.float64)
    lat = np.asarray(lat, dtype=np.float64)
    k = np.pi / 180.0 * EARTH_R_M
    x = (lon - lon0) * np.cos(np.deg2rad(lat0)) * k
    y = (lat - lat0) * k
    return x, y


def unproject_equirect(
    x: np.ndarray, y: np.ndarray, *, lon0: float = LON0, lat0: float = LAT0
) -> tuple[np.ndarray, np.ndarray]:
    """Inverse of :func:`project_equirect`."""
    x = np.asarray(x, dtype=np.float64)
    y = np.asarray(y, dtype=np.float64)
    k = np.pi / 180.0 * EARTH_R_M
    lon = x / (np.cos(np.deg2rad(lat0)) * k) + lon0
    lat = y / k + lat0
    return lon, lat


def haversine_m(
    lon1: np.ndarray, lat1: np.ndarray, lon2: np.ndarray, lat2: np.ndarray
) -> np.ndarray:
    """Great-circle distance in metres between lon/lat degree pairs."""
    lon1, lat1, lon2, lat2 = (
        np.deg2rad(np.asarray(a, dtype=np.float64)) for a in (lon1, lat1, lon2, lat2)
    )
    dlat = lat2 - lat1
    dlon = lon2 - lon1
    h = np.sin(dlat / 2) ** 2 + np.cos(lat1) * np.cos(lat2) * np.sin(dlon / 2) ** 2
    return 2 * EARTH_R_M * np.arcsin(np.sqrt(np.clip(h, 0.0, 1.0)))


def dist_point_point(
    ax: np.ndarray, ay: np.ndarray, bx: np.ndarray, by: np.ndarray
) -> np.ndarray:
    """Euclidean distance between point arrays (broadcasting)."""
    ax, ay, bx, by = (np.asarray(a, dtype=np.float64) for a in (ax, ay, bx, by))
    return np.hypot(ax - bx, ay - by)


def dist_point_segment(
    px: np.ndarray,
    py: np.ndarray,
    ax: float | np.ndarray,
    ay: float | np.ndarray,
    bx: float | np.ndarray,
    by: float | np.ndarray,
) -> np.ndarray:
    """Distance from points (px, py) to segment (a→b), broadcasting.

    Degenerate segments (a == b) fall back to point distance.
    """
    px, py, ax, ay, bx, by = (
        np.asarray(v, dtype=np.float64) for v in (px, py, ax, ay, bx, by)
    )
    dx, dy = bx - ax, by - ay
    len2 = dx * dx + dy * dy
    # Projection parameter of p onto the infinite line, clamped to [0, 1].
    with np.errstate(divide="ignore", invalid="ignore"):
        t = ((px - ax) * dx + (py - ay) * dy) / len2
    t = np.where(len2 > 0, t, 0.0)
    t = np.clip(t, 0.0, 1.0)
    cx, cy = ax + t * dx, ay + t * dy
    return np.hypot(px - cx, py - cy)


def _orient(ax, ay, bx, by, cx, cy):
    return (bx - ax) * (cy - ay) - (by - ay) * (cx - ax)


def segments_intersect(ax, ay, bx, by, cx, cy, dx, dy) -> np.ndarray:
    """True where segment (a→b) properly or improperly intersects (c→d)."""
    d1 = _orient(cx, cy, dx, dy, ax, ay)
    d2 = _orient(cx, cy, dx, dy, bx, by)
    d3 = _orient(ax, ay, bx, by, cx, cy)
    d4 = _orient(ax, ay, bx, by, dx, dy)
    proper = ((d1 > 0) != (d2 > 0)) & ((d3 > 0) != (d4 > 0))

    def on_seg(px, py, qx, qy, rx, ry, d):
        # r collinear with p→q and within its bbox.
        return (
            (d == 0)
            & (np.minimum(px, qx) <= rx)
            & (rx <= np.maximum(px, qx))
            & (np.minimum(py, qy) <= ry)
            & (ry <= np.maximum(py, qy))
        )

    touch = (
        on_seg(cx, cy, dx, dy, ax, ay, d1)
        | on_seg(cx, cy, dx, dy, bx, by, d2)
        | on_seg(ax, ay, bx, by, cx, cy, d3)
        | on_seg(ax, ay, bx, by, dx, dy, d4)
    )
    return proper | touch


def dist_segment_segment(ax, ay, bx, by, cx, cy, dx, dy) -> np.ndarray:
    """Minimum distance between segments (a→b) and (c→d), broadcasting.

    Zero where they intersect; otherwise the min of the four
    endpoint-to-opposite-segment distances (exact for non-intersecting
    planar segments).
    """
    inter = segments_intersect(ax, ay, bx, by, cx, cy, dx, dy)
    d = np.minimum.reduce(
        [
            dist_point_segment(ax, ay, cx, cy, dx, dy),
            dist_point_segment(bx, by, cx, cy, dx, dy),
            dist_point_segment(cx, cy, ax, ay, bx, by),
            dist_point_segment(dx, dy, ax, ay, bx, by),
        ]
    )
    return np.where(inter, 0.0, d)


def point_in_polygon(px: np.ndarray, py: np.ndarray, ring: np.ndarray) -> np.ndarray:
    """Ray-casting containment of points in a simple polygon ring.

    ``ring`` is an (N, 2) array of vertices (closing edge implied).
    Boundary points count as inside (consistent with MEOS `contains`
    being paired with distance-0 semantics).
    """
    px = np.asarray(px, dtype=np.float64)
    py = np.asarray(py, dtype=np.float64)
    ring = np.asarray(ring, dtype=np.float64)
    vx, vy = ring[:, 0], ring[:, 1]
    wx, wy = np.roll(vx, -1), np.roll(vy, -1)
    inside = np.zeros(np.broadcast(px, py).shape, dtype=bool)
    on_edge = np.zeros_like(inside)
    for i in range(len(ring)):
        x1, y1, x2, y2 = vx[i], vy[i], wx[i], wy[i]
        crosses = (y1 > py) != (y2 > py)
        with np.errstate(divide="ignore", invalid="ignore"):
            xint = (x2 - x1) * (py - y1) / (y2 - y1) + x1
        inside ^= crosses & (px < xint)
        on_edge |= dist_point_segment(px, py, x1, y1, x2, y2) == 0.0
    return inside | on_edge


@dataclass(frozen=True)
class Rect:
    """Axis-aligned rectangular zone (metres). SQL-expressible containment."""

    xmin: float
    ymin: float
    xmax: float
    ymax: float

    def contains(self, px: np.ndarray, py: np.ndarray) -> np.ndarray:
        px, py = np.asarray(px, np.float64), np.asarray(py, np.float64)
        return (
            (px >= self.xmin) & (px <= self.xmax) & (py >= self.ymin) & (py <= self.ymax)
        )

    def distance(self, px: np.ndarray, py: np.ndarray) -> np.ndarray:
        px, py = np.asarray(px, np.float64), np.asarray(py, np.float64)
        ddx = np.maximum(np.maximum(self.xmin - px, 0.0), px - self.xmax)
        ddy = np.maximum(np.maximum(self.ymin - py, 0.0), py - self.ymax)
        return np.hypot(ddx, ddy)

    @property
    def center(self) -> tuple[float, float]:
        return ((self.xmin + self.xmax) / 2.0, (self.ymin + self.ymax) / 2.0)


@dataclass(frozen=True)
class Circle:
    """Circular zone (metres). SQL-expressible containment via distance."""

    cx: float
    cy: float
    r: float

    def contains(self, px: np.ndarray, py: np.ndarray) -> np.ndarray:
        return dist_point_point(px, py, self.cx, self.cy) <= self.r

    def distance(self, px: np.ndarray, py: np.ndarray) -> np.ndarray:
        return np.maximum(dist_point_point(px, py, self.cx, self.cy) - self.r, 0.0)

    @property
    def center(self) -> tuple[float, float]:
        return (self.cx, self.cy)


class Polygon:
    """Simple polygon zone (general case; not used in SQL-oracle tests)."""

    def __init__(self, ring) -> None:
        ring = np.asarray(ring, dtype=np.float64)
        if ring.ndim != 2 or ring.shape[1] != 2 or len(ring) < 3:
            raise ValueError("Polygon needs an (N>=3, 2) vertex array")
        # Drop an explicit closing vertex if present.
        if np.allclose(ring[0], ring[-1]):
            ring = ring[:-1]
        self.ring = ring

    def contains(self, px: np.ndarray, py: np.ndarray) -> np.ndarray:
        return point_in_polygon(px, py, self.ring)

    def distance(self, px: np.ndarray, py: np.ndarray) -> np.ndarray:
        """0 inside; else min distance to the boundary."""
        px = np.asarray(px, np.float64)
        py = np.asarray(py, np.float64)
        vx, vy = self.ring[:, 0], self.ring[:, 1]
        wx, wy = np.roll(vx, -1), np.roll(vy, -1)
        d = np.full(np.broadcast(px, py).shape, np.inf)
        for i in range(len(self.ring)):
            d = np.minimum(d, dist_point_segment(px, py, vx[i], vy[i], wx[i], wy[i]))
        return np.where(self.contains(px, py), 0.0, d)

    @property
    def center(self) -> tuple[float, float]:
        return (float(self.ring[:, 0].mean()), float(self.ring[:, 1].mean()))
