"""Unit tests for repro.sncb.weather — OpenMeteo substitute."""
import duckdb
import numpy as np
import pandas as pd
import pytest

from repro.sncb.network import stations
from repro.sncb.trains import T0_EPOCH
from repro.sncb.weather import (
    CELL_SIZE_M,
    CONDITION_LIMIT_KMH,
    CONDITIONS,
    cell_id_of,
    cell_id_sql,
    grid_origin,
    weather_stream,
)


class TestGrid:
    def test_covers_all_stations(self):
        x0, y0, nx, ny = grid_origin()
        for s in stations():
            assert x0 <= s.x <= x0 + nx * CELL_SIZE_M
            assert y0 <= s.y <= y0 + ny * CELL_SIZE_M

    def test_cell_ids_in_range(self):
        _, _, nx, ny = grid_origin()
        xs = np.array([s.x for s in stations()])
        ys = np.array([s.y for s in stations()])
        ids = cell_id_of(xs, ys)
        assert ids.min() >= 0
        assert ids.max() < nx * ny

    def test_same_cell_for_nearby_points(self):
        x0, y0, _, _ = grid_origin()
        cx, cy = x0 + CELL_SIZE_M * 1.5, y0 + CELL_SIZE_M * 1.5
        a = cell_id_of(np.array([cx]), np.array([cy]))
        b = cell_id_of(np.array([cx + 100.0]), np.array([cy + 100.0]))
        assert a[0] == b[0]

    def test_adjacent_cells_differ(self):
        x0, y0, _, _ = grid_origin()
        cx, cy = x0 + CELL_SIZE_M * 0.5, y0 + CELL_SIZE_M * 0.5
        a = cell_id_of(np.array([cx]), np.array([cy]))
        b = cell_id_of(np.array([cx + CELL_SIZE_M]), np.array([cy]))
        assert b[0] == a[0] + 1

    def test_sql_matches_python(self):
        rng = np.random.default_rng(3)
        pts = pd.DataFrame(
            {"x": rng.uniform(-250_000, 250_000, 2000),
             "y": rng.uniform(-150_000, 150_000, 2000)}
        )
        expected = cell_id_of(pts["x"].to_numpy(), pts["y"].to_numpy())
        con = duckdb.connect()
        try:
            con.register("pts", pts)
            got = con.execute(
                f"SELECT {cell_id_sql()} AS cid FROM pts"
            ).fetchdf()["cid"].to_numpy()
        finally:
            con.close()
        np.testing.assert_array_equal(got, expected)


class TestWeatherStream:
    def test_covers_duration(self):
        w = weather_stream(t0=T0_EPOCH, duration_s=3600.0, seed=0)
        assert w["t_start"].min() == T0_EPOCH
        assert w["t_end"].max() == T0_EPOCH + 3600.0

    def test_every_cell_every_interval(self):
        _, _, nx, ny = grid_origin()
        w = weather_stream(t0=0.0, duration_s=1800.0, seed=0, interval_s=600.0)
        assert len(w) == nx * ny * 3
        assert w.groupby("cell_id").size().nunique() == 1

    def test_conditions_valid(self):
        w = weather_stream(t0=0.0, duration_s=7200.0, seed=0)
        assert set(w["condition"]).issubset(set(CONDITIONS))

    def test_limits_follow_rule_table(self):
        w = weather_stream(t0=0.0, duration_s=7200.0, seed=1)
        for cond, lim in CONDITION_LIMIT_KMH.items():
            sub = w[w["condition"] == cond]["suggested_limit_kmh"]
            if np.isnan(lim):
                assert sub.isna().all()
            else:
                assert (sub == lim).all()

    def test_adverse_conditions_occur(self):
        w = weather_stream(t0=0.0, duration_s=7200.0, seed=0)
        assert w["suggested_limit_kmh"].notna().sum() > 0

    def test_deterministic(self):
        a = weather_stream(t0=0.0, duration_s=1800.0, seed=9)
        b = weather_stream(t0=0.0, duration_s=1800.0, seed=9)
        pd.testing.assert_frame_equal(a, b)

    def test_seed_varies(self):
        a = weather_stream(t0=0.0, duration_s=1800.0, seed=1)
        b = weather_stream(t0=0.0, duration_s=1800.0, seed=2)
        assert not a["condition"].equals(b["condition"])

    def test_invalid_duration_raises(self):
        with pytest.raises(ValueError):
            weather_stream(t0=0.0, duration_s=0.0)

    def test_intervals_tile_time(self):
        w = weather_stream(t0=0.0, duration_s=1500.0, seed=0, interval_s=600.0)
        one_cell = w[w["cell_id"] == w["cell_id"].iloc[0]].sort_values("t_start")
        np.testing.assert_allclose(one_cell["t_start"], [0.0, 600.0, 1200.0])
        np.testing.assert_allclose(one_cell["t_end"], [600.0, 1200.0, 1500.0])
