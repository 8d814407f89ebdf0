"""Constraint generation for SimplifiedMKP (paper §V-A, Alg. 1 line 2).

``get_constraints`` produces the family of *relevant* constraint sets
``V_i`` — for each execution step, the nodes that would be resident in
the Memory Catalog at that step if flagged — after the paper's three
simplifications:

* node exclusion: drop nodes with ``s_i > M`` (can never fit) or
  ``t_i = 0`` (flagging contributes nothing);
* maximality: drop any ``V_i`` that is a strict subset of another
  (its capacity constraint is implied);
* triviality: drop any ``V_i`` whose total size is ≤ M (cannot be
  violated even if everything in it is flagged).
"""
from __future__ import annotations

from typing import Sequence

from repro.core.graph import DepGraph


def excluded_nodes(g: DepGraph, budget: float) -> set[int]:
    """Paper's ``V_exclude``: nodes that can never be profitably flagged."""
    return {i for i in range(g.n) if g.sizes[i] > budget or g.scores[i] == 0}


def get_constraints(
    g: DepGraph, order: Sequence[int], budget: float
) -> list[frozenset[int]]:
    """Maximal, non-trivial per-step resident sets over non-excluded nodes.

    Runs in one linear scan over steps to build candidate sets, then a
    pairwise maximality filter (set count is ≤ n, so this is cheap for
    the ≤100-node graphs S/C targets).
    """
    excl = excluded_nodes(g, budget)
    candidates: list[frozenset[int]] = []
    for step_set in g.resident_sets(order):
        vs = frozenset(v for v in step_set if v not in excl)
        if not vs:
            continue
        if sum(g.sizes[v] for v in vs) <= budget + 1e-9:
            continue  # trivial: cannot be violated
        candidates.append(vs)
    # Dedupe, then keep only maximal sets.
    uniq = list(dict.fromkeys(candidates))
    maximal = [
        a
        for a in uniq
        if not any(a < b for b in uniq)  # strict subset of another → drop
    ]
    return maximal
