"""SNCB data substitute.

The paper streams six months of sensor data from edge devices on six
SNCB trains (GPS, battery voltage, brake pressure, noise, passenger
load). That dataset is proprietary, so this package synthesises the
closest deterministic equivalent: a 12-station rail network in the
Belgian bounding box, kinematic train motion along route polylines with
station dwells and injected unscheduled stops, per-channel sensor
models with parameterised fault injection, and an OpenMeteo-substitute
weather grid. Every generator is deterministic in its ``seed`` so the
DuckDB oracle sees identical input.
"""
