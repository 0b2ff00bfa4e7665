"""Visualization payload builders (paper Figure 3, substitution S8)."""
from repro.viz.payload import build_map_payload, build_timeseries_payload  # noqa: F401
