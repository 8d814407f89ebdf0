"""Execution-order solutions to S/C Opt Order (paper §V-B) and baselines.

``ma_dfs`` is the paper's memory-aware DFS: a DFS-discipline topological
sort (finish a branch before opening a new one, so flagged parents are
released as soon as possible) whose tie-breaks prefer the candidate with
the *lowest actual memory consumption* — a node's size if it is flagged,
0 otherwise. Scheduling cheap branches first defers large flagged nodes
so they spend fewer steps resident (paper Fig. 8).

Baselines (paper §VI-A):

* ``simulated_annealing`` — hill-climbing over valid orders with random
  feasible swaps, accepting worsening moves with decaying probability;
* ``separator`` — divide-and-conquer: recursively split the DAG with a
  precedence-respecting cut that greedily minimizes the flagged bytes
  crossing it; concatenated blocks give the order.
"""
from __future__ import annotations

import math
import random
from typing import Iterable, Sequence

from repro.core.graph import DepGraph


def ma_dfs(g: DepGraph, flagged: Iterable[int]) -> list[int]:
    """Memory-aware DFS schedule (paper §V-B).

    Maintains the DFS chain of executed nodes; the next node is a ready
    child of the deepest chain node that has one (branch-finishing),
    otherwise the cheapest globally-ready node. Ready = all parents
    executed. Tie-break key: (actual memory consumption, descendant
    count, node id). The primary key is the paper's rule; the secondary
    prefers shorter branches, which finishes them sooner and therefore
    releases flagged ancestors sooner (the paper's stated goal of the
    DFS discipline); the id makes the order deterministic.
    """
    fl = set(flagged)
    n_desc = _descendant_counts(g)

    def key(v: int) -> tuple[float, int, int]:
        return (g.sizes[v] if v in fl else 0.0, n_desc[v], v)

    executed: set[int] = set()
    remaining_parents = [len(g.parents(v)) for v in range(g.n)]
    ready = {v for v in range(g.n) if remaining_parents[v] == 0}
    chain: list[int] = []
    order: list[int] = []

    def run(v: int) -> None:
        ready.discard(v)
        executed.add(v)
        order.append(v)
        chain.append(v)
        for c in g.children(v):
            remaining_parents[c] -= 1
            if remaining_parents[c] == 0:
                ready.add(c)

    while len(order) < g.n:
        nxt: int | None = None
        # Deepen: a ready child of the most recent chain node that has one.
        while chain:
            cands = [c for c in g.children(chain[-1]) if c in ready]
            if cands:
                nxt = min(cands, key=key)
                break
            chain.pop()  # branch exhausted — backtrack
        if nxt is None:
            nxt = min(ready, key=key)  # start a new branch
        run(nxt)
    return order


def _descendant_counts(g: DepGraph) -> list[int]:
    """Number of (transitive) descendants of each node, via one
    reverse-topological sweep over descendant bitsets."""
    order = g.topological_order()
    assert order is not None
    desc = [0] * g.n
    bits = [0] * g.n
    for v in reversed(order):
        acc = 0
        for c in g.children(v):
            acc |= bits[c] | (1 << c)
        bits[v] = acc
        desc[v] = acc.bit_count()
    return desc


def simulated_annealing(
    g: DepGraph,
    flagged: Iterable[int],
    *,
    initial: Sequence[int] | None = None,
    iterations: int = 10_000,
    seed: int = 0,
    t0: float = 1.0,
) -> list[int]:
    """SA baseline [64]: random feasible position-swaps, accepted when
    they lower average memory usage (or probabilistically otherwise)."""
    rng = random.Random(seed)
    order = list(initial) if initial is not None else g.topological_order()
    assert order is not None
    fl = set(flagged)
    cur = g.average_memory(fl, order)
    for it in range(iterations):
        i, j = rng.randrange(g.n), rng.randrange(g.n)
        if i == j:
            continue
        order[i], order[j] = order[j], order[i]
        if not g.is_valid_order(order):
            order[i], order[j] = order[j], order[i]
            continue
        new = g.average_memory(fl, order)
        temp = t0 * (1.0 - it / iterations)
        if new <= cur or rng.random() < math.exp(-(new - cur + 1e-12) / max(temp, 1e-9)):
            cur = new
        else:
            order[i], order[j] = order[j], order[i]
    return order


def separator(g: DepGraph, flagged: Iterable[int]) -> list[int]:
    """Separator baseline [70,71]: recursive precedence-respecting cuts.

    At each level, greedily grow a down-closed prefix block of half the
    nodes, preferring additions that minimize the flagged bytes whose
    dependency edges cross the cut; recurse on both blocks. Unlike
    MA-DFS this ignores residency duration, and (as the paper observes)
    the block structure often yields infeasible orders under tight M.
    """
    fl = set(flagged)

    def split(nodes: list[int]) -> list[int]:
        if len(nodes) <= 1:
            return list(nodes)
        in_block = set()
        node_set = set(nodes)
        target = (len(nodes) + 1) // 2
        remaining_parents = {
            v: sum(1 for p in g.parents(v) if p in node_set) for v in nodes
        }
        ready = {v for v in nodes if remaining_parents[v] == 0}
        while len(in_block) < target and ready:
            # cost of adding v = flagged bytes it forces across the cut
            def cost(v: int) -> tuple[float, int]:
                cross = 0.0
                if v in fl and any(
                    c in node_set and c not in in_block for c in g.children(v)
                ):
                    cross += g.sizes[v]
                return (cross, v)

            v = min(ready, key=cost)
            ready.discard(v)
            in_block.add(v)
            for c in g.children(v):
                if c in node_set:
                    remaining_parents[c] -= 1
                    if remaining_parents[c] == 0:
                        ready.add(c)
        first = [v for v in nodes if v in in_block]
        second = [v for v in nodes if v not in in_block]
        return split(first) + split(second)

    order = split(g.topological_order() or [])
    return order


ORDER_SCHEDULERS = {
    "madfs": ma_dfs,
    "sa": simulated_annealing,
    "separator": separator,
}
