"""Geospatial Complex Event Processing substrate.

The paper's GCEP "is extended from the work presented in [10]" (Ziehn,
Complex Event Processing for the Internet of Things): patterns over
spatiotemporal streams are *declared*, then compiled onto the stream
engine's operators. This package reproduces that layer: declarative
pattern specs (`patterns`) and a matcher (`matcher`) that lowers each
spec onto the NebulaMEOS window operators — threshold windows for
duration patterns, keyed tumbling windows for repetition patterns,
sliding windows for model-deviation patterns.
"""
from repro.cep.matcher import match
from repro.cep.patterns import DeviationFromModel, RepeatedWithin, ThresholdRun

__all__ = ["DeviationFromModel", "RepeatedWithin", "ThresholdRun", "match"]
