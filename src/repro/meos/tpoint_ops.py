"""MEOS spatiotemporal operators over temporal point sequences.

These are the functions the paper's NebulaMEOS operators wrap:

* ``tpoint_at_stbox`` — restrict a temporal point to a spatiotemporal
  box, with **exact parametric clipping**: each linearly interpolated
  segment is intersected with the box in the time parameter, so
  entry/exit instants are interpolated, not snapped to samples.
* ``edwithin`` — "ever within distance": true iff the moving point ever
  comes within ``d`` metres of a static geometry, evaluated exactly on
  the interpolated motion (not just at samples), with an STBox prune
  first (the MEOS evaluation strategy).
* ``tdwithin_periods`` — the time periods during which the moving point
  is within ``d`` of a point/circle geometry (exact quadratic solve).
* ``nearest_approach_distance`` — min distance ever reached.
"""
from __future__ import annotations

import numpy as np

from repro.meos.geometry import (
    Circle,
    Polygon,
    Rect,
    dist_point_point,
    dist_point_segment,
    dist_segment_segment,
)
from repro.meos.stbox import STBox
from repro.meos.temporal import TGeomPointSeq

_EPS = 1e-9


def _interval_for_axis(v0: float, v1: float, lo: float, hi: float) -> tuple[float, float]:
    """Parameter sub-interval s∈[0,1] of a linear segment v(s)=v0+s·(v1−v0)
    where v ∈ [lo, hi]; returns (1, 0) (empty) when disjoint."""
    dv = v1 - v0
    if abs(dv) < _EPS:
        return (0.0, 1.0) if lo - _EPS <= v0 <= hi + _EPS else (1.0, 0.0)
    s0 = (lo - v0) / dv
    s1 = (hi - v0) / dv
    if s0 > s1:
        s0, s1 = s1, s0
    return max(s0, 0.0), min(s1, 1.0)


def _merge_periods(periods: list[tuple[float, float]]) -> list[tuple[float, float]]:
    """Union of possibly-overlapping closed periods, sorted and merged."""
    if not periods:
        return []
    periods = sorted(periods)
    out = [list(periods[0])]
    for lo, hi in periods[1:]:
        if lo <= out[-1][1] + _EPS:
            out[-1][1] = max(out[-1][1], hi)
        else:
            out.append([lo, hi])
    return [(float(a), float(b)) for a, b in out]


def tpoint_at_stbox(seq: TGeomPointSeq, box: STBox) -> list[TGeomPointSeq]:
    """MEOS ``tpoint_at_stbox``: the pieces of ``seq`` inside ``box``.

    Returns a (possibly empty) list of sub-sequences; entry/exit
    positions are linearly interpolated at the box boundary. A piece may
    degenerate to a single instant if the motion only touches the box.
    """
    if not seq.bbox.intersects(box):
        return []
    if len(seq) == 1:
        inside = box.contains_point(seq.x, seq.y, seq.t)
        return [seq] if bool(inside[0]) else []

    periods: list[tuple[float, float]] = []
    t, x, y = seq.t, seq.x, seq.y
    for i in range(len(seq) - 1):
        t0, t1 = float(t[i]), float(t[i + 1])
        sx = _interval_for_axis(float(x[i]), float(x[i + 1]), box.xmin, box.xmax)
        sy = _interval_for_axis(float(y[i]), float(y[i + 1]), box.ymin, box.ymax)
        dt = t1 - t0
        st = _interval_for_axis(t0, t1, box.tmin, box.tmax) if dt > 0 else (0.0, 1.0)
        lo = max(sx[0], sy[0], st[0])
        hi = min(sx[1], sy[1], st[1])
        if lo <= hi:
            periods.append((t0 + lo * dt, t0 + hi * dt))
    merged = _merge_periods(periods)

    pieces: list[TGeomPointSeq] = []
    for lo, hi in merged:
        piece = seq.at_period(lo, hi)
        if piece is not None:
            pieces.append(piece)
    return pieces


def _segment_geom_distance(seq: TGeomPointSeq, geom) -> np.ndarray:
    """Exact min distance from every motion segment of ``seq`` to a
    static geometry (length n−1; for n==1, distance of the lone point,
    length 1)."""
    if len(seq) == 1:
        return _point_geom_distance(seq.x, seq.y, geom)
    ax, ay = seq.x[:-1], seq.y[:-1]
    bx, by = seq.x[1:], seq.y[1:]
    if isinstance(geom, tuple):  # bare point (px, py)
        px, py = geom
        return dist_point_segment(px, py, ax, ay, bx, by)
    if isinstance(geom, Circle):
        return np.maximum(
            dist_point_segment(geom.cx, geom.cy, ax, ay, bx, by) - geom.r, 0.0
        )
    ring = _ring_of(geom)
    vx, vy = ring[:, 0], ring[:, 1]
    wx, wy = np.roll(vx, -1), np.roll(vy, -1)
    d = np.full(ax.shape, np.inf)
    for j in range(len(ring)):
        d = np.minimum(
            d, dist_segment_segment(ax, ay, bx, by, vx[j], vy[j], wx[j], wy[j])
        )
    # A segment strictly inside the polygon never touches an edge → use
    # endpoint containment (sufficient for simple polygons: a segment
    # crossing the boundary has edge distance 0 via intersection).
    inside = geom.contains(ax, ay) | geom.contains(bx, by)
    return np.where(inside, 0.0, d)


def _point_geom_distance(px, py, geom) -> np.ndarray:
    if isinstance(geom, tuple):
        return dist_point_point(px, py, geom[0], geom[1])
    return geom.distance(px, py)


def _ring_of(geom) -> np.ndarray:
    if isinstance(geom, Polygon):
        return geom.ring
    if isinstance(geom, Rect):
        return np.array(
            [
                [geom.xmin, geom.ymin],
                [geom.xmax, geom.ymin],
                [geom.xmax, geom.ymax],
                [geom.xmin, geom.ymax],
            ]
        )
    raise TypeError(f"unsupported geometry {type(geom).__name__}")


def _geom_bbox(geom) -> STBox:
    if isinstance(geom, tuple):
        return STBox(geom[0], geom[0], geom[1], geom[1])
    if isinstance(geom, Circle):
        return STBox(geom.cx - geom.r, geom.cx + geom.r, geom.cy - geom.r, geom.cy + geom.r)
    ring = _ring_of(geom)
    return STBox(
        float(ring[:, 0].min()), float(ring[:, 0].max()),
        float(ring[:, 1].min()), float(ring[:, 1].max()),
    )


def nearest_approach_distance(seq: TGeomPointSeq, geom) -> float:
    """Min distance ever reached between the moving point and ``geom``
    (MEOS ``nearestApproachDistance``), exact on interpolated motion."""
    return float(_segment_geom_distance(seq, geom).min())


def edwithin(seq: TGeomPointSeq, geom, d: float) -> bool:
    """MEOS ``edwithin``: does the moving point *ever* come within ``d``
    metres of ``geom``? STBox prune first, exact segment check after."""
    if d < 0:
        raise ValueError("negative distance")
    if not seq.bbox.intersects(_geom_bbox(geom).expand_space(d)):
        return False
    return nearest_approach_distance(seq, geom) <= d + _EPS


def tdwithin_periods(seq: TGeomPointSeq, geom, d: float) -> list[tuple[float, float]]:
    """Time periods during which ``dist(seq(t), geom) <= d``.

    Exact (quadratic solve per segment) for point and :class:`Circle`
    geometries — the cases the paper's queries need; other geometries
    raise ``TypeError`` (use :func:`edwithin` / :func:`tpoint_at_stbox`).
    """
    if isinstance(geom, tuple):
        cx, cy, r = float(geom[0]), float(geom[1]), 0.0
    elif isinstance(geom, Circle):
        cx, cy, r = geom.cx, geom.cy, geom.r
    else:
        raise TypeError("tdwithin_periods supports point/Circle geometries only")
    rad = d + r
    if len(seq) == 1:
        ok = dist_point_point(seq.x[0], seq.y[0], cx, cy) <= rad + _EPS
        return [(float(seq.t[0]), float(seq.t[0]))] if ok else []

    periods: list[tuple[float, float]] = []
    t, x, y = seq.t, seq.x, seq.y
    for i in range(len(seq) - 1):
        t0, t1 = float(t[i]), float(t[i + 1])
        dt = t1 - t0
        ex, ey = x[i] - cx, y[i] - cy
        dx, dy = x[i + 1] - x[i], y[i + 1] - y[i]
        # |e + s·dvec|² ≤ rad²  →  a·s² + b·s + c ≤ 0,  s ∈ [0, 1]
        a = dx * dx + dy * dy
        b = 2.0 * (ex * dx + ey * dy)
        c = ex * ex + ey * ey - rad * rad
        if a < _EPS:
            if c <= _EPS:
                periods.append((t0, t1))
            continue
        disc = b * b - 4.0 * a * c
        if disc < 0:
            continue
        sq = np.sqrt(disc)
        s0 = max((-b - sq) / (2.0 * a), 0.0)
        s1 = min((-b + sq) / (2.0 * a), 1.0)
        if s0 <= s1:
            periods.append((t0 + s0 * dt, t0 + s1 * dt))
    return _merge_periods(periods)
