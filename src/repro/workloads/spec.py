"""Workload specification: a DAG of MV definitions (paper §III-A).

An :class:`MVSpec` is one node of the dependency graph — a single MV
update, carrying the SQL statement that (re)creates it. ``parents``
names the *other MVs* the statement reads; base tables are not parents
(S/C never short-circuits base-table reads — only intermediate ones).

A :class:`WorkloadSpec` is the full graph. Node order in ``nodes`` is a
valid declaration order (parents precede children), mirroring how dbt or
LookML would emit them; the optimizer is free to reorder.
"""
from __future__ import annotations

import re
from dataclasses import dataclass

from repro.core.graph import DepGraph


@dataclass(frozen=True)
class MVSpec:
    """One MV update: ``CREATE TABLE <name> AS <sql>``."""

    name: str
    sql: str
    parents: tuple[str, ...] = ()


@dataclass(frozen=True)
class WorkloadSpec:
    """A named DAG of MV updates over a fixed set of base tables."""

    name: str
    nodes: tuple[MVSpec, ...]
    base_tables: tuple[str, ...]

    def __post_init__(self) -> None:
        seen: set[str] = set()
        for nd in self.nodes:
            if nd.name in seen:
                raise ValueError(f"duplicate MV name {nd.name!r}")
            for p in nd.parents:
                if p not in seen:
                    raise ValueError(
                        f"{self.name}: node {nd.name!r} lists parent {p!r} "
                        "that is not declared earlier (cycle or typo)"
                    )
            seen.add(nd.name)

    @property
    def node_names(self) -> list[str]:
        return [nd.name for nd in self.nodes]

    def node(self, name: str) -> MVSpec:
        for nd in self.nodes:
            if nd.name == name:
                return nd
        raise KeyError(name)

    def index(self) -> dict[str, int]:
        return {nd.name: i for i, nd in enumerate(self.nodes)}

    def edges(self) -> list[tuple[int, int]]:
        idx = self.index()
        return [
            (idx[p], idx[nd.name]) for nd in self.nodes for p in nd.parents
        ]

    def referenced_tables(self, node: MVSpec) -> set[str]:
        """Identifiers in the node's SQL that name a base table or an MV
        of this workload — used to cross-check declared parents."""
        idents = set(re.findall(r"[A-Za-z_][A-Za-z0-9_]*", node.sql.lower()))
        known = set(self.base_tables) | set(self.node_names)
        return idents & known - {node.name}

    def to_depgraph(
        self,
        sizes: dict[str, float],
        scores: dict[str, float],
    ) -> DepGraph:
        """Attach observed sizes/speedup scores to produce the optimizer's
        input (paper §IV: graph + node sizes + speedup scores)."""
        return DepGraph(
            n=len(self.nodes),
            edges=tuple(self.edges()),
            sizes=tuple(sizes[nd.name] for nd in self.nodes),
            scores=tuple(scores[nd.name] for nd in self.nodes),
            names=tuple(self.node_names),
        )
