"""Temporal point sequences — the central MEOS data type.

A ``TGeomPointSeq`` is a time-ordered sequence of (x, y, t) instants
with *linear interpolation* between consecutive instants: the object is
assumed to move in a straight line at constant speed within each
segment, exactly the MEOS ``tgeompoint`` sequence semantics. Times are
float seconds (epoch or relative — the type is agnostic).

Operations reproduced from MEOS: ``value_at`` (interpolated position),
``at_period`` (temporal restriction with boundary interpolation),
``resample`` (regular re-sampling = the paper's "real-time
spatiotemporal imputation"), ``speed``, ``length``, ``duration``,
``time_weighted_avg``.
"""
from __future__ import annotations

import numpy as np

from repro.meos.stbox import STBox


class TGeomPointSeq:
    """Linearly interpolated temporal point: arrays t (strictly
    increasing, float seconds), x, y (metres)."""

    __slots__ = ("t", "x", "y")

    def __init__(self, t, x, y) -> None:
        t = np.asarray(t, dtype=np.float64)
        x = np.asarray(x, dtype=np.float64)
        y = np.asarray(y, dtype=np.float64)
        if not (t.shape == x.shape == y.shape) or t.ndim != 1 or t.size == 0:
            raise ValueError("t, x, y must be equal-length non-empty 1-D arrays")
        if t.size > 1 and not np.all(np.diff(t) > 0):
            raise ValueError("timestamps must be strictly increasing")
        self.t, self.x, self.y = t, x, y

    # ---- basic accessors ---------------------------------------------
    def __len__(self) -> int:
        return int(self.t.size)

    @property
    def bbox(self) -> STBox:
        """Tight spatiotemporal bound (exact for linear interpolation,
        since segments stay inside their endpoints' bbox)."""
        return STBox.from_points(self.x, self.y, self.t)

    def duration(self) -> float:
        """Seconds covered by the sequence."""
        return float(self.t[-1] - self.t[0])

    def length(self) -> float:
        """Travelled distance in metres (sum of segment lengths)."""
        return float(np.hypot(np.diff(self.x), np.diff(self.y)).sum())

    # ---- interpolation ------------------------------------------------
    def value_at(self, at: float | np.ndarray) -> tuple[np.ndarray, np.ndarray]:
        """Interpolated (x, y) at time(s) ``at``; NaN outside the extent."""
        at = np.asarray(at, dtype=np.float64)
        xi = np.interp(at, self.t, self.x, left=np.nan, right=np.nan)
        yi = np.interp(at, self.t, self.y, left=np.nan, right=np.nan)
        # np.interp clamps at the boundaries; mask strictly-outside times.
        out = (at < self.t[0]) | (at > self.t[-1])
        xi = np.where(out, np.nan, xi)
        yi = np.where(out, np.nan, yi)
        return xi, yi

    def at_period(self, tmin: float, tmax: float) -> "TGeomPointSeq | None":
        """Restrict to [tmin, tmax], interpolating boundary instants —
        MEOS ``atTime`` over a period. None if disjoint."""
        if tmax < tmin:
            raise ValueError("tmax < tmin")
        if tmax < self.t[0] or tmin > self.t[-1]:
            return None
        lo = max(tmin, float(self.t[0]))
        hi = min(tmax, float(self.t[-1]))
        inner = (self.t > lo) & (self.t < hi)
        ts = np.concatenate(([lo], self.t[inner], [hi])) if hi > lo else np.array([lo])
        ts = np.unique(ts)
        xs, ys = self.value_at(ts)
        return TGeomPointSeq(ts, xs, ys)

    def resample(self, step: float, *, t0: float | None = None) -> "TGeomPointSeq":
        """Regular re-sampling every ``step`` seconds (linear imputation).

        This is the paper's "real-time spatiotemporal imputation": gaps
        in the raw GPS stream are filled with interpolated positions on
        a regular grid aligned at ``t0`` (default: first instant).
        """
        if step <= 0:
            raise ValueError("step must be positive")
        start = self.t[0] if t0 is None else max(t0, self.t[0])
        ts = np.arange(start, self.t[-1] + step * 1e-9, step)
        if ts.size == 0 or ts[-1] < self.t[-1] - 1e-9:
            ts = np.append(ts, self.t[-1])
        xs, ys = self.value_at(ts)
        return TGeomPointSeq(ts, xs, ys)

    # ---- derived channels ---------------------------------------------
    def speed(self) -> np.ndarray:
        """Per-segment speed in m/s (length n-1); empty for a single
        instant. Constant within a segment under linear interpolation."""
        if len(self) < 2:
            return np.empty(0, dtype=np.float64)
        dt = np.diff(self.t)
        return np.hypot(np.diff(self.x), np.diff(self.y)) / dt

    def time_weighted_avg(self, values: np.ndarray) -> float:
        """Time-weighted average of per-instant ``values`` (MEOS
        ``twAvg``): trapezoidal integral over time / duration. Falls
        back to the plain mean for a single instant."""
        values = np.asarray(values, dtype=np.float64)
        if values.shape != self.t.shape:
            raise ValueError("values must align with instants")
        if len(self) == 1 or self.duration() == 0:
            return float(values.mean())
        return float(np.trapz(values, self.t) / self.duration())

    # ---- misc ---------------------------------------------------------
    def __repr__(self) -> str:  # pragma: no cover - debug aid
        return (
            f"TGeomPointSeq(n={len(self)}, "
            f"t=[{self.t[0]:.0f},{self.t[-1]:.0f}])"
        )
