"""MEOS (Mobility Engine Open Source) substitute.

A from-scratch, numpy-vectorised spatiotemporal kernel reproducing the
MEOS concepts the paper uses: geometry primitives, spatiotemporal
bounding boxes (``STBox``), temporal point sequences with linear
interpolation (``TGeomPointSeq``), and the predicates NebulaMEOS wraps
as stream operators (``edwithin``, ``tpoint_at_stbox``).

Pure Python + numpy — no Spark dependency — so it can be shipped into
Arrow UDF workers unchanged (the "runs on a Raspberry Pi" property of
the real MEOS maps to "runs inside any Python worker" here).
"""
from repro.meos.geometry import (
    Circle,
    Polygon,
    Rect,
    dist_point_point,
    dist_point_segment,
    dist_segment_segment,
    haversine_m,
    point_in_polygon,
    project_equirect,
    unproject_equirect,
)
from repro.meos.stbox import STBox
from repro.meos.temporal import TGeomPointSeq
from repro.meos.tpoint_ops import (
    edwithin,
    nearest_approach_distance,
    tdwithin_periods,
    tpoint_at_stbox,
)

__all__ = [
    "Circle",
    "Polygon",
    "Rect",
    "STBox",
    "TGeomPointSeq",
    "dist_point_point",
    "dist_point_segment",
    "dist_segment_segment",
    "edwithin",
    "haversine_m",
    "nearest_approach_distance",
    "point_in_polygon",
    "project_equirect",
    "tdwithin_periods",
    "tpoint_at_stbox",
    "unproject_equirect",
]
