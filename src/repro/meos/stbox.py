"""Spatiotemporal bounding box (STBox), the core MEOS index structure.

An ``STBox`` bounds a moving object in space (x/y metres) and time
(seconds since epoch, float). MEOS uses STBoxes both as query regions
(``tpoint_at_stbox``) and as per-sequence summaries enabling cheap
pruning before exact predicate evaluation — both uses are reproduced
here.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass(frozen=True)
class STBox:
    """Axis-aligned box over (x, y, t). Any dimension may be unbounded."""

    xmin: float = -np.inf
    xmax: float = np.inf
    ymin: float = -np.inf
    ymax: float = np.inf
    tmin: float = -np.inf
    tmax: float = np.inf

    def __post_init__(self) -> None:
        if self.xmin > self.xmax or self.ymin > self.ymax or self.tmin > self.tmax:
            raise ValueError(f"degenerate STBox: {self}")

    # ---- constructors -------------------------------------------------
    @staticmethod
    def from_points(x: np.ndarray, y: np.ndarray, t: np.ndarray) -> "STBox":
        """Tight bound of a point set — the per-sequence summary box."""
        x, y, t = (np.asarray(a, dtype=np.float64) for a in (x, y, t))
        if x.size == 0:
            raise ValueError("empty point set")
        return STBox(
            float(x.min()), float(x.max()),
            float(y.min()), float(y.max()),
            float(t.min()), float(t.max()),
        )

    # ---- predicates ---------------------------------------------------
    def contains_point(self, x: np.ndarray, y: np.ndarray, t: np.ndarray) -> np.ndarray:
        """Vectorised containment of (x, y, t) samples (closed box)."""
        x, y, t = (np.asarray(a, dtype=np.float64) for a in (x, y, t))
        return (
            (x >= self.xmin) & (x <= self.xmax)
            & (y >= self.ymin) & (y <= self.ymax)
            & (t >= self.tmin) & (t <= self.tmax)
        )

    def intersects(self, other: "STBox") -> bool:
        """Closed-box overlap test — the pruning predicate."""
        return (
            self.xmin <= other.xmax and other.xmin <= self.xmax
            and self.ymin <= other.ymax and other.ymin <= self.ymax
            and self.tmin <= other.tmax and other.tmin <= self.tmax
        )

    def contains_box(self, other: "STBox") -> bool:
        return (
            self.xmin <= other.xmin and other.xmax <= self.xmax
            and self.ymin <= other.ymin and other.ymax <= self.ymax
            and self.tmin <= other.tmin and other.tmax <= self.tmax
        )

    # ---- transforms ---------------------------------------------------
    def expand_space(self, d: float) -> "STBox":
        """Grow the spatial extent by ``d`` metres on every side (MEOS
        ``expandSpace``) — used to turn a distance predicate into a box
        prune: edwithin(seq, g, d) ⇒ seq.bbox ∩ g.bbox.expand_space(d)."""
        if d < 0:
            raise ValueError("negative expansion")
        return STBox(
            self.xmin - d, self.xmax + d,
            self.ymin - d, self.ymax + d,
            self.tmin, self.tmax,
        )

    def expand_time(self, dt: float) -> "STBox":
        if dt < 0:
            raise ValueError("negative expansion")
        return STBox(self.xmin, self.xmax, self.ymin, self.ymax,
                     self.tmin - dt, self.tmax + dt)

    def union(self, other: "STBox") -> "STBox":
        return STBox(
            min(self.xmin, other.xmin), max(self.xmax, other.xmax),
            min(self.ymin, other.ymin), max(self.ymax, other.ymax),
            min(self.tmin, other.tmin), max(self.tmax, other.tmax),
        )
