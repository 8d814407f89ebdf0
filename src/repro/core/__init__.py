"""S/C Opt core: dependency graph model, MKP flagging, MA-DFS ordering,
and the alternating optimization that ties them together (paper §IV-V)."""

from repro.core.graph import DepGraph, Plan  # noqa: F401
