"""Unit tests for repro.sncb.network — synthetic rail network."""
import numpy as np
import pytest

from repro.sncb.network import (
    N_TRAINS,
    ROUTES,
    TRAIN_ASSIGNMENT,
    cum_arclength,
    point_at_arclength,
    route_length,
    route_polyline,
    route_station_ids,
    stations,
    stations_df,
)


class TestStations:
    def test_twelve_stations(self):
        assert len(stations()) == 12

    def test_unique_ids_and_names(self):
        ss = stations()
        assert len({s.station_id for s in ss}) == 12
        assert len({s.name for s in ss}) == 12

    def test_ids_are_positional(self):
        for i, s in enumerate(stations()):
            assert s.station_id == i

    def test_df_matches(self):
        df = stations_df()
        assert list(df.columns) == ["station_id", "name", "x", "y"]
        assert len(df) == 12

    def test_positions_within_belgium_extent(self):
        # Projected Belgium spans roughly ±250 km around the origin.
        df = stations_df()
        assert df["x"].abs().max() < 300_000
        assert df["y"].abs().max() < 300_000

    def test_brussels_near_origin(self):
        b = next(s for s in stations() if s.name == "Brussels")
        assert np.hypot(b.x, b.y) < 50_000


class TestRoutes:
    def test_three_routes(self):
        assert set(ROUTES) == {"R1", "R2", "R3"}

    def test_all_routes_at_least_four_stations(self):
        for ids in ROUTES.values():
            assert len(ids) >= 4

    def test_valid_station_ids(self):
        for ids in ROUTES.values():
            assert all(0 <= i < 12 for i in ids)

    def test_polyline_shape(self):
        poly = route_polyline("R1")
        assert poly.shape == (len(ROUTES["R1"]), 2)

    def test_reverse_direction(self):
        fwd = route_polyline("R1", +1)
        rev = route_polyline("R1", -1)
        np.testing.assert_allclose(rev, fwd[::-1])

    def test_station_ids_reverse(self):
        assert route_station_ids("R2", -1) == ROUTES["R2"][::-1]

    def test_route_lengths_plausible(self):
        # Main lines in Belgium are 100–300 km.
        for r in ROUTES:
            assert 50_000 < route_length(r) < 400_000

    def test_r1_longest(self):
        assert route_length("R1") > route_length("R2")


class TestArclength:
    POLY = np.array([[0.0, 0.0], [100.0, 0.0], [100.0, 50.0]])

    def test_cum_arclength(self):
        np.testing.assert_allclose(cum_arclength(self.POLY), [0.0, 100.0, 150.0])

    def test_point_at_zero(self):
        x, y = point_at_arclength(self.POLY, np.array([0.0]))
        assert (x[0], y[0]) == (0.0, 0.0)

    def test_point_mid_first_leg(self):
        x, y = point_at_arclength(self.POLY, np.array([50.0]))
        assert (x[0], y[0]) == (50.0, 0.0)

    def test_point_on_second_leg(self):
        x, y = point_at_arclength(self.POLY, np.array([125.0]))
        assert (x[0], y[0]) == (100.0, 25.0)

    def test_clamps_beyond_end(self):
        x, y = point_at_arclength(self.POLY, np.array([1e9]))
        assert (x[0], y[0]) == (100.0, 50.0)

    def test_clamps_negative(self):
        x, y = point_at_arclength(self.POLY, np.array([-5.0]))
        assert (x[0], y[0]) == (0.0, 0.0)


class TestAssignment:
    def test_six_trains(self):
        assert len(TRAIN_ASSIGNMENT) == N_TRAINS == 6

    def test_two_per_route_opposite_directions(self):
        by_route: dict[str, list[int]] = {}
        for _, (r, d) in TRAIN_ASSIGNMENT.items():
            by_route.setdefault(r, []).append(d)
        for dirs in by_route.values():
            assert sorted(dirs) == [-1, 1]

    def test_every_route_served(self):
        assert {r for r, _ in TRAIN_ASSIGNMENT.values()} == set(ROUTES)
