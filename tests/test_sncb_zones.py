"""Unit tests for repro.sncb.zones — geofence zone catalogue."""
import duckdb
import numpy as np
import pandas as pd
import pytest

from repro.meos.geometry import Circle, Rect
from repro.meos.vectorized import in_any_zone
from repro.sncb.network import route_length, route_polyline, point_at_arclength, stations
from repro.sncb.zones import (
    STATION_RADIUS_M,
    shapes_from_df,
    zones_df,
    zones_sql_predicate,
)


class TestZonesDf:
    def test_all_kinds_present(self):
        kinds = set(zones_df()["kind"])
        assert kinds == {"station", "workshop", "maintenance", "curve", "neighbourhood"}

    def test_unique_zone_ids(self):
        df = zones_df()
        assert df["zone_id"].is_unique

    def test_station_zone_per_station(self):
        assert len(zones_df(["station"])) == len(stations())

    def test_three_workshops(self):
        assert len(zones_df(["workshop"])) == 3

    def test_curves_carry_speed_limits(self):
        cz = zones_df(["curve"])
        assert cz["speed_limit_kmh"].notna().all()
        assert set(cz["speed_limit_kmh"]).issubset({60.0, 80.0})

    def test_non_curve_zones_have_no_limit(self):
        others = zones_df(["station", "workshop", "maintenance", "neighbourhood"])
        assert others["speed_limit_kmh"].isna().all()

    def test_kind_filter(self):
        df = zones_df(["curve", "workshop"])
        assert set(df["kind"]) == {"curve", "workshop"}

    def test_circle_rows_have_bbox(self):
        c = zones_df(["station"]).iloc[0]
        assert c.xmax - c.xmin == pytest.approx(2 * STATION_RADIUS_M)

    def test_maintenance_zones_on_route(self):
        # Each maintenance zone must contain the route point it was
        # placed on — i.e. trains will pass through it.
        mz = zones_df(["maintenance"])
        shapes, _ = shapes_from_df(mz)
        for shape, name in zip(shapes, mz["name"]):
            route = name.split("-")[0]
            frac = int(name.split("-")[-1]) / 100.0
            poly = route_polyline(route)
            x, y = point_at_arclength(poly, np.array([frac * route_length(route)]))
            assert shape.contains(x, y)[0]

    def test_curve_zones_on_route(self):
        cz = zones_df(["curve"])
        shapes, _ = shapes_from_df(cz)
        for shape, name in zip(shapes, cz["name"]):
            route = name.split("-")[0]
            frac = int(name.split("-")[-1]) / 100.0
            poly = route_polyline(route)
            x, y = point_at_arclength(poly, np.array([frac * route_length(route)]))
            assert shape.contains(x, y)[0]


class TestShapesFromDf:
    def test_types(self):
        df = zones_df()
        shapes, ids = shapes_from_df(df)
        assert len(shapes) == len(df) == len(ids)
        for shape, row in zip(shapes, df.itertuples()):
            assert isinstance(shape, Circle if row.shape == "circle" else Rect)

    def test_station_center_contained(self):
        sdf = zones_df(["station"])
        shapes, _ = shapes_from_df(sdf)
        for shape, s in zip(shapes, stations()):
            assert shape.contains(np.array([s.x]), np.array([s.y]))[0]

    def test_ids_match(self):
        df = zones_df(["workshop"])
        _, ids = shapes_from_df(df)
        assert ids == df["zone_id"].tolist()


class TestSqlPredicate:
    def test_matches_vectorized_kernel(self):
        """The DuckDB predicate must agree with in_any_zone on random
        points — this equivalence is what makes the oracle trustworthy
        for the geofence queries."""
        df = zones_df()
        shapes, _ = shapes_from_df(df)
        rng = np.random.default_rng(7)
        pts = pd.DataFrame(
            {
                "x": rng.uniform(-250_000, 250_000, 3000),
                "y": rng.uniform(-150_000, 150_000, 3000),
            }
        )
        expected = in_any_zone(pts["x"].to_numpy(), pts["y"].to_numpy(), shapes)
        con = duckdb.connect()
        try:
            con.register("pts", pts)
            got = (
                con.execute(
                    f"SELECT {zones_sql_predicate(df)} AS hit FROM pts"
                )
                .fetchdf()["hit"]
                .to_numpy()
            )
        finally:
            con.close()
        np.testing.assert_array_equal(got, expected)

    def test_some_zone_points_hit(self):
        df = zones_df(["station"])
        s = stations()[0]
        con = duckdb.connect()
        try:
            con.register("pts", pd.DataFrame({"x": [s.x], "y": [s.y]}))
            got = con.execute(
                f"SELECT {zones_sql_predicate(df)} AS hit FROM pts"
            ).fetchdf()
        finally:
            con.close()
        assert bool(got["hit"][0])

    def test_empty_zone_frame_is_false(self):
        assert zones_sql_predicate(zones_df().iloc[0:0]) == "FALSE"
