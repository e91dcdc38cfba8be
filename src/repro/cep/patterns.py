"""Declarative GCEP pattern specifications.

Three pattern families cover the paper's §3.2 queries:

* :class:`ThresholdRun` — a condition holding *continuously* for at
  least a duration (Q7 "train stops ≥ N s", Q8b "pressure low while
  moving for ≥ N s").
* :class:`RepeatedWithin` — at least K occurrences of a condition
  within a time window, optionally per extra key such as a track
  segment (Q8a "repeated emergency brakes in specific track segments").
* :class:`DeviationFromModel` — a measured channel deviating from a
  reference model beyond a tolerance, smoothed over a sliding window
  (Q5 "charge/discharge cycles follow a predefined curve").

A spec is pure data: SQL-expression strings (evaluated by Catalyst)
plus parameters. The matcher lowers it onto the window operators.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class ThresholdRun:
    """Condition true continuously for ≥ ``min_duration_s`` per key."""

    condition: str                      # SQL boolean expression over event columns
    min_duration_s: float
    value_cols: tuple[str, ...] = ()    # aggregated (mean/min/max) per run
    carry_cols: tuple[str, ...] = ()    # first value carried per run

    def __post_init__(self) -> None:
        if not self.condition.strip():
            raise ValueError("empty condition")
        if self.min_duration_s < 0:
            raise ValueError("negative min_duration_s")


@dataclass(frozen=True)
class RepeatedWithin:
    """≥ ``min_count`` events matching ``condition`` inside a tumbling
    window, grouped by key (+ optional extra grouping expressions)."""

    condition: str
    window: str = "120 seconds"
    min_count: int = 3
    group_exprs: tuple[tuple[str, str], ...] = ()   # (alias, SQL expr)

    def __post_init__(self) -> None:
        if not self.condition.strip():
            raise ValueError("empty condition")
        if self.min_count < 1:
            raise ValueError("min_count must be >= 1")


@dataclass(frozen=True)
class DeviationFromModel:
    """|measured − model(t)| beyond ``tolerance`` on sliding-window
    average. ``model_expr`` is a SQL expression of event columns (e.g.
    a registered MEOS UDF call)."""

    measured_col: str
    model_expr: str
    tolerance: float
    window: str = "300 seconds"
    slide: str = "60 seconds"

    def __post_init__(self) -> None:
        if self.tolerance <= 0:
            raise ValueError("tolerance must be positive")
