"""MV refresh workloads: the five TPC-DS-derived workloads of paper
Table III and the synthetic DAG generator of §VI-H."""

from repro.workloads.spec import MVSpec, WorkloadSpec  # noqa: F401
