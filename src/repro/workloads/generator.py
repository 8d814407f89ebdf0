"""Synthetic workload generator (paper §VI-A "Generated Workload").

Creates realistic dependency graphs for the §VI-H scalability study.
Two components, as in the paper:

1. a **staged DAG generator**: the DAG follows the structure of Spark
   workloads — ``height`` stages of ``width`` nodes each (height/width
   ratio is a sweep parameter), per-stage node counts perturbed by a
   normal with ``stage_stdev``, and each node's out-degree drawn
   uniformly from ``[0, max_outdegree]`` toward the next stage;
2. a **Markov chain over node operations** (SCAN → FILTER/JOIN/AGG/
   UNION …) that determines each node's operation, from which its size
   and speedup score are derived from its inputs. The paper trains the
   chain on TPC-DS + Spider query structures; offline we hardcode a
   transition matrix with the same qualitative shape (scans feed joins,
   joins feed aggregations, aggregations feed small downstream ops).

Root node sizes are sampled from the table-size distribution of the
100 GB TPC-DS dataset; speedup scores use the paper environment's disk
bandwidths (519.8 MB/s read, 358.9 MB/s write).
"""
from __future__ import annotations

import math
import random
from dataclasses import dataclass

from repro.core.graph import DepGraph

# 100 GB TPC-DS table sizes in GB (facts down to mid-size dims) — root
# nodes read base tables, so their outputs follow this distribution.
TPCDS_100GB_TABLE_GB = [38.6, 19.3, 9.8, 5.1, 2.6, 1.2, 0.6, 0.3, 0.1]

READ_BW_GBPS = 519.8 / 1024  # paper §VI-A environment
WRITE_BW_GBPS = 358.9 / 1024

OPS = ("SCAN", "FILTER", "JOIN", "AGG", "UNION")

# Markov transition matrix P[op_of_parent][op_of_child]; rows sum to 1.
_TRANSITIONS = {
    "SCAN": {"FILTER": 0.40, "JOIN": 0.40, "AGG": 0.15, "UNION": 0.05},
    "FILTER": {"FILTER": 0.15, "JOIN": 0.45, "AGG": 0.30, "UNION": 0.10},
    "JOIN": {"FILTER": 0.20, "JOIN": 0.30, "AGG": 0.40, "UNION": 0.10},
    "AGG": {"FILTER": 0.20, "JOIN": 0.40, "AGG": 0.25, "UNION": 0.15},
    "UNION": {"FILTER": 0.25, "JOIN": 0.30, "AGG": 0.35, "UNION": 0.10},
}

# Output size as a function of the operation and the input sizes.
_SIZE_RULES = {
    "FILTER": lambda ins: 0.35 * max(ins),
    "JOIN": lambda ins: 0.60 * sum(ins),
    "AGG": lambda ins: 0.04 * max(ins),
    "UNION": lambda ins: 0.90 * sum(ins),
}


@dataclass(frozen=True)
class GenParams:
    """Sweep parameters of paper Fig. 13/14."""

    n_nodes: int = 100
    height_width_ratio: float = 1.0
    max_outdegree: int = 4
    stage_stdev: float = 1.0
    seed: int = 0


def generate_dag(params: GenParams) -> DepGraph:
    """One synthetic workload DAG with sizes (GB) and speedup scores (s)."""
    rng = random.Random(params.seed)
    n = params.n_nodes
    height = max(1, round(math.sqrt(n * params.height_width_ratio)))
    width = max(1.0, n / height)

    # Per-stage node counts: normal around `width`, clipped ≥1, rescaled to n.
    counts = [
        max(1, round(rng.gauss(width, params.stage_stdev))) for _ in range(height)
    ]
    while sum(counts) != n:  # nudge toward exactly n nodes
        i = rng.randrange(height)
        if sum(counts) > n and counts[i] > 1:
            counts[i] -= 1
        elif sum(counts) < n:
            counts[i] += 1

    stages: list[list[int]] = []
    nid = 0
    for c in counts:
        stages.append(list(range(nid, nid + c)))
        nid += c

    edges: list[tuple[int, int]] = []
    ops: list[str] = [""] * n
    sizes: list[float] = [0.0] * n

    for v in stages[0]:
        ops[v] = "SCAN"
        sizes[v] = rng.choice(TPCDS_100GB_TABLE_GB)

    for s in range(1, height):
        prev, cur = stages[s - 1], stages[s]
        # Desired out-degree per upstream node: U[0, max_outdegree].
        budget = {u: rng.randint(0, params.max_outdegree) for u in prev}
        for v in cur:
            # Every node needs ≥1 parent; prefer upstream nodes with
            # remaining out-degree budget, fall back to any.
            avail = [u for u in prev if budget[u] > 0]
            u = rng.choice(avail if avail else prev)
            budget[u] = max(0, budget[u] - 1)
            parents = {u}
            # Extra parents while upstream budget allows (JOIN/UNION shape).
            extra = rng.randint(0, 2)
            for _ in range(extra):
                avail = [u2 for u2 in prev if budget[u2] > 0 and u2 not in parents]
                if not avail:
                    break
                u2 = rng.choice(avail)
                budget[u2] -= 1
                parents.add(u2)
            for u3 in sorted(parents):
                edges.append((u3, v))
            # Operation via the Markov chain, conditioned on a random parent.
            pop = ops[rng.choice(sorted(parents))]
            r, acc = rng.random(), 0.0
            ops[v] = "AGG"
            for op, prob in _TRANSITIONS[pop].items():
                acc += prob
                if r <= acc:
                    ops[v] = op
                    break
            ins = [sizes[u4] for u4 in parents]
            sizes[v] = max(1e-4, _SIZE_RULES[ops[v]](ins))

    # Speedup scores from sizes and the paper environment's bandwidths.
    n_children = [0] * n
    for u, v in edges:
        n_children[u] += 1
    scores = [
        n_children[i] * sizes[i] / READ_BW_GBPS + sizes[i] / WRITE_BW_GBPS
        for i in range(n)
    ]
    return DepGraph(
        n=n,
        edges=tuple(edges),
        sizes=tuple(sizes),
        scores=tuple(scores),
        names=tuple(f"{ops[i].lower()}{i}" for i in range(n)),
    )
