"""Metadata-calibrated accounting of MV refresh runs — used for the
scale-gated experiments (paper Tables IV and V; DESIGN.md §4.4-4.5)."""

from repro.sim.engine import SimTotals, simulate_run  # noqa: F401
