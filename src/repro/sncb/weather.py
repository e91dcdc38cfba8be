"""OpenMeteo substitute: a synthetic weather grid stream (Query 4).

The paper joins train positions with OpenMeteo conditions; offline we
synthesise the same shape: a rectangular grid of weather cells covering
the network, each cell emitting a condition per fixed interval. The
cell id of a position is a pure arithmetic function of (x, y) so the
join is expressible both as a Spark column expression and in DuckDB SQL
for the oracle.

Condition → suggested speed limit (km/h), per the paper's "heavy rain,
snow, or fog" rule: heavy_rain → 80, snow → 60, fog → 50; clear/rain
impose no limit (encoded as NaN).
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.sncb.network import stations

CELL_SIZE_M = 40_000.0
INTERVAL_S = 600.0

CONDITIONS = ["clear", "rain", "heavy_rain", "snow", "fog"]
_COND_P = [0.55, 0.20, 0.10, 0.08, 0.07]

#: condition → suggested max speed (km/h); NaN = unrestricted.
CONDITION_LIMIT_KMH: dict[str, float] = {
    "clear": float("nan"),
    "rain": float("nan"),
    "heavy_rain": 80.0,
    "snow": 60.0,
    "fog": 50.0,
}


def grid_origin() -> tuple[float, float, int, int]:
    """(x0, y0, nx, ny) of the weather grid: the station bounding box
    padded by one cell."""
    ss = stations()
    xs = np.array([s.x for s in ss])
    ys = np.array([s.y for s in ss])
    x0 = float(xs.min() - CELL_SIZE_M)
    y0 = float(ys.min() - CELL_SIZE_M)
    nx = int(np.ceil((xs.max() + CELL_SIZE_M - x0) / CELL_SIZE_M))
    ny = int(np.ceil((ys.max() + CELL_SIZE_M - y0) / CELL_SIZE_M))
    return x0, y0, nx, ny


def cell_id_of(x: np.ndarray, y: np.ndarray) -> np.ndarray:
    """Weather cell id of planar positions — floor-grid arithmetic,
    mirrored 1:1 in SQL by :func:`cell_id_sql`."""
    x0, y0, nx, _ = grid_origin()
    ix = np.floor((np.asarray(x, np.float64) - x0) / CELL_SIZE_M).astype(np.int64)
    iy = np.floor((np.asarray(y, np.float64) - y0) / CELL_SIZE_M).astype(np.int64)
    return iy * nx + ix


def cell_id_sql(x: str = "x", y: str = "y") -> str:
    """DuckDB expression computing the same cell id as ``cell_id_of``."""
    x0, y0, nx, _ = grid_origin()
    return (
        f"(CAST(floor(({y} - {y0!r}) / {CELL_SIZE_M!r}) AS BIGINT) * {nx} "
        f"+ CAST(floor(({x} - {x0!r}) / {CELL_SIZE_M!r}) AS BIGINT))"
    )


def weather_stream(
    *,
    t0: float,
    duration_s: float,
    seed: int = 0,
    interval_s: float = INTERVAL_S,
) -> pd.DataFrame:
    """Per-(cell, interval) conditions over [t0, t0 + duration_s).

    Columns: cell_id, t_start, t_end (epoch s), condition,
    suggested_limit_kmh (NaN when unrestricted).
    """
    if duration_s <= 0 or interval_s <= 0:
        raise ValueError("duration_s and interval_s must be positive")
    x0, y0, nx, ny = grid_origin()
    del x0, y0
    rng = np.random.default_rng(seed + 97)
    n_int = int(np.ceil(duration_s / interval_s))
    cells = np.arange(nx * ny, dtype=np.int64)
    cell_col = np.repeat(cells, n_int)
    int_idx = np.tile(np.arange(n_int), nx * ny)
    cond = rng.choice(CONDITIONS, size=len(cell_col), p=_COND_P)
    t_start = t0 + int_idx * interval_s
    return pd.DataFrame(
        {
            "cell_id": cell_col,
            "t_start": t_start,
            "t_end": np.minimum(t_start + interval_s, t0 + duration_s),
            "condition": cond,
            "suggested_limit_kmh": pd.Series(cond).map(CONDITION_LIMIT_KMH).to_numpy(),
        }
    )
