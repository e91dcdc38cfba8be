"""Tests for repro.nebula.expressions — expression tree → Catalyst."""
import numpy as np
import pandas as pd
import pytest

from repro.meos.geometry import Circle, Rect
from repro.meos.stbox import STBox
from repro.nebula.expressions import (
    BinaryExpression,
    EdWithinExpression,
    FieldAccess,
    Literal,
    NearestZoneExpression,
    TPointAtStboxExpression,
    ZoneIdExpression,
    field,
)

ZONES = [Rect(0, 0, 100, 100), Circle(500, 0, 50)]
IDS = [1, 2]


@pytest.fixture(scope="module")
def events(spark):
    pdf = pd.DataFrame(
        {
            "x": [50.0, 490.0, 300.0, 120.0],
            "y": [50.0, 0.0, 300.0, 0.0],
            "ts": [10.0, 20.0, 30.0, 40.0],
            "speed": [10.0, 20.0, 30.0, 40.0],
        }
    )
    return spark.createDataFrame(pdf)


class TestCoreExpressions:
    def test_field_compiles(self, events):
        got = events.select(field("speed").to_column().alias("v")).toPandas()
        np.testing.assert_allclose(sorted(got["v"]), [10, 20, 30, 40])

    def test_literal(self, events):
        got = events.select(Literal(7).to_column().alias("c")).toPandas()
        assert (got["c"] == 7).all()

    def test_arithmetic_composition(self, events):
        expr = (field("speed") * 2 + 1) / 3
        got = events.select(expr.to_column().alias("v")).orderBy("v").toPandas()
        np.testing.assert_allclose(got["v"], [(s * 2 + 1) / 3 for s in [10, 20, 30, 40]])

    def test_comparison(self, events):
        kept = events.filter((field("speed") > 25).to_column()).toPandas()
        assert sorted(kept["speed"]) == [30, 40]

    def test_boolean_and(self, events):
        pred = (field("speed") > 15) & (field("x") < 400)
        kept = events.filter(pred.to_column()).toPandas()
        assert sorted(kept["speed"]) == [30, 40]

    def test_boolean_or_and_not(self, events):
        pred = ~((field("speed") <= 15) | (field("x") >= 400))
        kept = events.filter(pred.to_column()).toPandas()
        assert sorted(kept["speed"]) == [30, 40]

    def test_eq_ne(self, events):
        kept = events.filter(field("speed").eq(20).to_column()).toPandas()
        assert list(kept["speed"]) == [20]
        kept2 = events.filter(field("speed").ne(20).to_column()).toPandas()
        assert len(kept2) == 3

    def test_unknown_operator_rejected(self):
        with pytest.raises(ValueError):
            BinaryExpression("%", Literal(1), Literal(2))

    def test_repr_compositional(self):
        assert "speed" in repr(field("speed") + 1)


class TestEdWithin:
    def test_filters_by_distance(self, events):
        expr = EdWithinExpression(field("x"), field("y"), ZONES, 25.0)
        kept = events.filter(expr.to_column()).orderBy("ts").toPandas()
        # (50,50) inside rect; (490,0) inside circle; (120,0) 20 m from
        # rect edge; (300,300) is far from both.
        assert list(kept["ts"]) == [10.0, 20.0, 40.0]

    def test_zero_distance_containment(self, events):
        expr = EdWithinExpression(field("x"), field("y"), ZONES, 0.0)
        kept = events.filter(expr.to_column()).orderBy("ts").toPandas()
        assert list(kept["ts"]) == [10.0, 20.0]

    def test_negative_distance_rejected(self):
        with pytest.raises(ValueError):
            EdWithinExpression(field("x"), field("y"), ZONES, -1.0)


class TestTPointAtStbox:
    def test_restricts_space_and_time(self, events):
        box = STBox(0, 200, -10, 60, 0, 25)
        expr = TPointAtStboxExpression(field("x"), field("y"), field("ts"), box)
        kept = events.filter(expr.to_column()).toPandas()
        # (50,50,t10) in box; (490,…) outside x; (120,0,t40) outside time.
        assert list(kept["ts"]) == [10.0]

    def test_unbounded_box_keeps_all(self, events):
        expr = TPointAtStboxExpression(field("x"), field("y"), field("ts"), STBox())
        assert events.filter(expr.to_column()).count() == 4


class TestZoneExpressions:
    def test_zone_id(self, events):
        expr = ZoneIdExpression(field("x"), field("y"), ZONES, IDS)
        got = events.select("ts", expr.to_column().alias("zid")).orderBy("ts").toPandas()
        assert list(got["zid"]) == [1, 2, -1, -1]

    def test_nearest_zone(self, events):
        expr = NearestZoneExpression(field("x"), field("y"), ZONES, IDS)
        got = events.select("ts", expr.to_column().alias("zid")).orderBy("ts").toPandas()
        # (300,300): rect corner (100,100) ≈ 283 m vs circle ≈ 311 m.
        assert list(got["zid"]) == [1, 2, 1, 1]
