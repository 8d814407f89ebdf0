"""Dependency-graph model for S/C Opt (paper §IV).

A :class:`DepGraph` is the optimizer's view of an MV refresh run: ``n``
nodes (individual MV updates), directed edges ``(parent, child)`` for
"child reads parent's output", a size ``s_i`` (bytes the output occupies
in the Memory Catalog) and a speedup score ``t_i`` per node.

Memory-residency semantics (paper §III-C): a *flagged* node is created
directly in the Memory Catalog and released as soon as its last child
has finished executing — but never before its background
materialization completed (paper Fig. 6, t4: MV1 is deleted only once
fully materialized). Under an execution order this means node ``v`` is
resident at step ``p`` iff ``pos[v] <= p <= release[v]`` where
``release[v] = max(pos[v], max_{(v,c) in E} pos[c])``; a *childless*
flagged node is conservatively modeled as resident until the end of the
run (its async write bounds its release, which the unit-time model
cannot place earlier) — exactly when the Controller frees it.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterable, Sequence


@dataclass(frozen=True)
class DepGraph:
    """Immutable DAG of MV updates with per-node sizes and speedup scores."""

    n: int
    edges: tuple[tuple[int, int], ...]
    sizes: tuple[float, ...]
    scores: tuple[float, ...]
    names: tuple[str, ...] = ()

    # Adjacency caches (computed once in __post_init__; object is frozen
    # so we stash them via object.__setattr__).
    _children: tuple[tuple[int, ...], ...] = field(default=(), repr=False)
    _parents: tuple[tuple[int, ...], ...] = field(default=(), repr=False)

    def __post_init__(self) -> None:
        if len(self.sizes) != self.n or len(self.scores) != self.n:
            raise ValueError("sizes/scores length must equal n")
        if self.names and len(self.names) != self.n:
            raise ValueError("names length must equal n")
        ch: list[list[int]] = [[] for _ in range(self.n)]
        pa: list[list[int]] = [[] for _ in range(self.n)]
        for u, v in self.edges:
            if not (0 <= u < self.n and 0 <= v < self.n):
                raise ValueError(f"edge ({u},{v}) out of range")
            if u == v:
                raise ValueError(f"self-loop on node {u}")
            ch[u].append(v)
            pa[v].append(u)
        object.__setattr__(self, "_children", tuple(tuple(c) for c in ch))
        object.__setattr__(self, "_parents", tuple(tuple(p) for p in pa))
        if self.topological_order() is None:
            raise ValueError("dependency graph contains a cycle")

    # ---- structure ----------------------------------------------------
    def children(self, i: int) -> tuple[int, ...]:
        return self._children[i]

    def parents(self, i: int) -> tuple[int, ...]:
        return self._parents[i]

    def roots(self) -> list[int]:
        """Nodes with no parents (read only base tables)."""
        return [i for i in range(self.n) if not self._parents[i]]

    def name(self, i: int) -> str:
        return self.names[i] if self.names else f"v{i}"

    def topological_order(self) -> list[int] | None:
        """Kahn's algorithm; ``None`` if the graph is cyclic.

        Deterministic: ready nodes are taken in ascending id order, so
        repeated runs (and the DuckDB oracle) see the same order.
        """
        indeg = [len(self._parents[i]) for i in range(self.n)]
        import heapq

        ready = [i for i in range(self.n) if indeg[i] == 0]
        heapq.heapify(ready)
        out: list[int] = []
        while ready:
            u = heapq.heappop(ready)
            out.append(u)
            for v in self._children[u]:
                indeg[v] -= 1
                if indeg[v] == 0:
                    heapq.heappush(ready, v)
        return out if len(out) == self.n else None

    def is_valid_order(self, order: Sequence[int]) -> bool:
        """True iff ``order`` is a permutation of nodes respecting edges."""
        if sorted(order) != list(range(self.n)):
            return False
        pos = positions(order)
        return all(pos[u] < pos[v] for u, v in self.edges)

    # ---- memory accounting --------------------------------------------
    def release_positions(self, order: Sequence[int]) -> list[int]:
        """``release[v]``: last step at which ``v`` (if flagged) is resident.

        With children: after the last child's step. Childless: end of
        the run — the slot is only freed once the background write
        finishes, which the unit-time model bounds by the run's end
        (and which the Controller implements literally).
        """
        pos = positions(order)
        return [
            max([pos[i]] + [pos[c] for c in self._children[i]])
            if self._children[i]
            else self.n - 1
            for i in range(self.n)
        ]

    def resident_sets(self, order: Sequence[int]) -> list[list[int]]:
        """For each step ``p``, nodes resident at ``p`` if flagged (paper's V_i,
        before exclusion)."""
        pos = positions(order)
        rel = self.release_positions(order)
        res: list[list[int]] = [[] for _ in range(self.n)]
        for v in range(self.n):
            for p in range(pos[v], rel[v] + 1):
                res[p].append(v)
        return res

    def memory_profile(
        self, flagged: Iterable[int], order: Sequence[int]
    ) -> list[float]:
        """Resident flagged bytes at each execution step (linear scan)."""
        fl = set(flagged)
        pos = positions(order)
        rel = self.release_positions(order)
        delta = [0.0] * (self.n + 1)
        for v in fl:
            delta[pos[v]] += self.sizes[v]
            delta[rel[v] + 1] -= self.sizes[v]
        prof: list[float] = []
        cur = 0.0
        for p in range(self.n):
            cur += delta[p]
            prof.append(cur)
        return prof

    def peak_memory(self, flagged: Iterable[int], order: Sequence[int]) -> float:
        prof = self.memory_profile(flagged, order)
        return max(prof, default=0.0)

    def average_memory(self, flagged: Iterable[int], order: Sequence[int]) -> float:
        """Objective of S/C Opt Order (paper Problem 3): mean over steps of
        resident flagged bytes, assuming unit job execution times."""
        prof = self.memory_profile(flagged, order)
        return sum(prof) / self.n if self.n else 0.0

    def is_feasible(
        self, flagged: Iterable[int], order: Sequence[int], budget: float
    ) -> bool:
        """Flagging ``flagged`` under ``order`` never exceeds ``budget`` bytes."""
        return self.peak_memory(flagged, order) <= budget + 1e-9

    def total_score(self, flagged: Iterable[int]) -> float:
        return sum(self.scores[i] for i in flagged)


def positions(order: Sequence[int]) -> list[int]:
    """Inverse permutation: ``pos[node] = step`` (paper's τ)."""
    pos = [0] * len(order)
    for p, v in enumerate(order):
        pos[v] = p
    return pos


@dataclass(frozen=True)
class Plan:
    """Optimizer output consumed by the Controller: an execution order and
    the set of flagged nodes (paper Fig. 4, right)."""

    order: tuple[int, ...]
    flagged: frozenset[int]

    def describe(self, g: DepGraph) -> str:
        steps = ", ".join(
            g.name(v) + ("*" if v in self.flagged else "") for v in self.order
        )
        return f"[{steps}] (* = kept in Memory Catalog)"
