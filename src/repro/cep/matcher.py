"""Compile GCEP pattern specs onto the stream-engine operators.

``match(df, pattern, key_cols=...)`` returns the matched complex events
as a DataFrame. Each pattern family lowers to a different operator:

* ThresholdRun       → `nebula.windows.threshold_window`
* RepeatedWithin     → keyed tumbling count + HAVING
* DeviationFromModel → keyed sliding avg + |avg| filter

so a declared pattern executes through exactly the operators the
NebulaMEOS queries use — the queries in `core.queries` are hand-fused
forms of these lowered plans (equivalence is tested in
tests/test_cep.py).
"""
from __future__ import annotations

from collections.abc import Sequence

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.cep.patterns import DeviationFromModel, RepeatedWithin, ThresholdRun
from repro.nebula.windows import sliding, threshold_window, tumbling


def match(
    df: DataFrame,
    pattern,
    *,
    key_cols: Sequence[str] = ("train_id",),
    ts_col: str = "ts",
    time_col: str = "t",
) -> DataFrame:
    """Match ``pattern`` over the event stream ``df`` per ``key_cols``."""
    if isinstance(pattern, ThresholdRun):
        return _match_threshold_run(df, pattern, key_cols, ts_col)
    if isinstance(pattern, RepeatedWithin):
        return _match_repeated_within(df, pattern, key_cols, time_col)
    if isinstance(pattern, DeviationFromModel):
        return _match_deviation(df, pattern, key_cols, time_col)
    raise TypeError(f"unknown pattern {type(pattern).__name__}")


def _match_threshold_run(
    df: DataFrame, p: ThresholdRun, key_cols: Sequence[str], ts_col: str
) -> DataFrame:
    flagged = df.withColumn("__flag", F.expr(p.condition))
    return threshold_window(
        flagged,
        key_cols=list(key_cols),
        ts_col=ts_col,
        flag_col="__flag",
        min_duration_s=p.min_duration_s,
        value_cols=list(p.value_cols),
        carry_cols=list(p.carry_cols),
    )


def _match_repeated_within(
    df: DataFrame, p: RepeatedWithin, key_cols: Sequence[str], time_col: str
) -> DataFrame:
    ev = df.filter(F.expr(p.condition))
    extra = []
    for alias, expr in p.group_exprs:
        ev = ev.withColumn(alias, F.expr(expr))
        extra.append(alias)
    agg = tumbling(
        ev, time_col=time_col, size=p.window, keys=[*key_cols, *extra],
        aggs=[F.count("*").alias("n_matches")],
    )
    return agg.filter(F.col("n_matches") >= p.min_count)


def _match_deviation(
    df: DataFrame, p: DeviationFromModel, key_cols: Sequence[str], time_col: str
) -> DataFrame:
    ev = df.withColumn(
        "__dev", F.col(p.measured_col) - F.expr(p.model_expr)
    )
    agg = sliding(
        ev, time_col=time_col, size=p.window, slide=p.slide, keys=list(key_cols),
        aggs=[F.avg("__dev").alias("avg_dev"), F.count("*").alias("n_events")],
    )
    return agg.filter(F.abs(F.col("avg_dev")) > p.tolerance)
