"""Tests for repro.nebula.plugin — runtime operator registration."""
import pandas as pd
import pytest

from repro.meos.geometry import Rect
from repro.nebula.expressions import EdWithinExpression, Expression, Literal, field
from repro.nebula.plugin import (
    MEOS_OPERATORS,
    PluginRegistry,
    default_registry,
    load_meos_plugin,
)


class TestPluginRegistry:
    def test_register_and_get(self):
        reg = PluginRegistry()
        reg.register("my_op", Literal)
        assert reg.get("my_op") is Literal
        assert "my_op" in reg

    def test_duplicate_rejected(self):
        reg = PluginRegistry()
        reg.register("op", Literal)
        with pytest.raises(ValueError):
            reg.register("op", Literal)

    def test_overwrite_allowed_explicitly(self):
        reg = PluginRegistry()
        reg.register("op", Literal)
        reg.register("op", EdWithinExpression, overwrite=True)
        assert reg.get("op") is EdWithinExpression

    def test_unregister(self):
        reg = PluginRegistry()
        reg.register("op", Literal)
        reg.unregister("op")
        assert "op" not in reg

    def test_unregister_missing_raises(self):
        with pytest.raises(KeyError):
            PluginRegistry().unregister("ghost")

    def test_get_missing_mentions_plugin(self):
        with pytest.raises(KeyError, match="plugin"):
            PluginRegistry().get("edwithin")

    def test_invalid_name_rejected(self):
        reg = PluginRegistry()
        for bad in ("", "has space", "1leading"):
            with pytest.raises(ValueError):
                reg.register(bad, Literal)

    def test_names_sorted(self):
        reg = PluginRegistry()
        reg.register("zeta", Literal)
        reg.register("alpha", Literal)
        assert reg.names() == ["alpha", "zeta"]

    def test_build_returns_expression(self):
        reg = PluginRegistry()
        reg.register("lit", Literal)
        assert isinstance(reg.build("lit", 5), Expression)

    def test_build_type_checks_factory(self):
        reg = PluginRegistry()
        reg.register("bogus", lambda: 42)
        with pytest.raises(TypeError):
            reg.build("bogus")


class TestMeosPlugin:
    def test_load_registers_all_operators(self):
        reg = PluginRegistry()
        names = load_meos_plugin(reg)
        assert set(names) == set(MEOS_OPERATORS)
        for n in names:
            assert n in reg

    def test_default_registry_preloaded(self):
        reg = default_registry()
        assert "edwithin" in reg and "tpoint_at_stbox" in reg

    def test_double_load_fails_loudly(self):
        reg = default_registry()
        with pytest.raises(ValueError):
            load_meos_plugin(reg)

    def test_built_operator_executes_on_spark(self, spark):
        """End-to-end §2.3 mechanism: register at runtime, build the
        expression by name, run it inside a Spark query."""
        reg = default_registry()
        expr = reg.build(
            "edwithin", field("x"), field("y"), [Rect(0, 0, 10, 10)], 1.0
        )
        df = spark.createDataFrame(pd.DataFrame({"x": [5.0, 50.0], "y": [5.0, 5.0]}))
        kept = df.filter(expr.to_column()).toPandas()
        assert list(kept["x"]) == [5.0]
