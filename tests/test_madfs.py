"""Unit tests for MA-DFS and order baselines (repro.core.madfs)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.graph import DepGraph
from repro.core.madfs import (
    _descendant_counts,
    ma_dfs,
    separator,
    simulated_annealing,
)


@st.composite
def random_graphs(draw):
    n = draw(st.integers(2, 12))
    edges = set()
    for v in range(1, n):
        for u in range(v):
            if draw(st.booleans()):
                edges.add((u, v))
    sizes = tuple(float(draw(st.integers(1, 10))) for _ in range(n))
    return DepGraph(
        n=n, edges=tuple(sorted(edges)), sizes=sizes, scores=sizes
    )


def fig8_graph():
    """Paper Fig. 8 shape: a branch where the *flagged smaller* node v3
    must be scheduled after the unflagged larger v2.

    v1 -> v2, v1 -> v3; v2 -> v4; v3 -> v5 -> v6.
    sizes: v2=50 (unflagged), v3=40 (flagged).
    """
    return DepGraph(
        n=6,
        edges=((0, 1), (0, 2), (1, 3), (2, 4), (4, 5)),
        sizes=(80.0, 50.0, 40.0, 5.0, 10.0, 20.0),
        scores=(80.0, 50.0, 40.0, 5.0, 10.0, 20.0),
    )


class TestMADFS:
    @given(random_graphs())
    @settings(max_examples=60, deadline=None)
    def test_valid_topological_order(self, g):
        flagged = set(range(0, g.n, 2))
        assert g.is_valid_order(ma_dfs(g, flagged))

    def test_deterministic(self):
        g = fig8_graph()
        assert ma_dfs(g, {0, 2}) == ma_dfs(g, {0, 2})

    def test_tie_break_prefers_unflagged(self):
        # At the v2/v3 branch, v2 (actual mem 0) goes first even though
        # it is larger than flagged v3 — the paper's Fig. 8 behaviour.
        g = fig8_graph()
        order = ma_dfs(g, flagged={2})
        assert order.index(1) < order.index(2)

    def test_tie_break_prefers_smaller_flagged(self):
        g = fig8_graph()
        order = ma_dfs(g, flagged={1, 2})  # both flagged: v3 (40) < v2 (50)
        assert order.index(2) < order.index(1)

    def test_branch_finishing(self):
        # chain branch completes before the sibling branch starts
        g = DepGraph(
            n=5,
            edges=((0, 1), (0, 3), (1, 2), (3, 4)),
            sizes=(1.0,) * 5,
            scores=(1.0,) * 5,
        )
        order = ma_dfs(g, set())
        i1, i2, i3, i4 = (order.index(k) for k in (1, 2, 3, 4))
        # whichever branch starts first finishes before the other starts
        assert (i2 < i3 and i1 < i2) or (i4 < i1 and i3 < i4)

    def test_reduces_average_memory_vs_topo(self):
        # 0 -> 2 with a cheap sibling 1: MA-DFS should schedule 2 before 1
        g = DepGraph(
            n=3, edges=((0, 2),), sizes=(10.0, 1.0, 1.0), scores=(10.0, 1.0, 1.0)
        )
        flagged = {0}
        order = ma_dfs(g, flagged)
        assert g.average_memory(flagged, order) <= g.average_memory(
            flagged, g.topological_order()
        )

    def test_descendant_counts(self):
        g = DepGraph(
            n=4, edges=((0, 1), (1, 2), (1, 3)), sizes=(1.0,) * 4,
            scores=(1.0,) * 4
        )
        assert _descendant_counts(g) == [3, 2, 0, 0]


class TestSimulatedAnnealing:
    @given(random_graphs())
    @settings(max_examples=15, deadline=None)
    def test_valid_order(self, g):
        order = simulated_annealing(g, {0}, iterations=200, seed=1)
        assert g.is_valid_order(order)

    def test_improves_or_matches_initial(self):
        g = DepGraph(
            n=4, edges=((0, 3),), sizes=(10.0, 1.0, 1.0, 1.0),
            scores=(10.0, 1.0, 1.0, 1.0)
        )
        init = [0, 1, 2, 3]
        out = simulated_annealing(g, {0}, initial=init, iterations=2000, seed=0)
        assert g.average_memory({0}, out) <= g.average_memory({0}, init)

    def test_deterministic_in_seed(self):
        g = fig8_graph()
        a = simulated_annealing(g, {0, 2}, iterations=300, seed=5)
        b = simulated_annealing(g, {0, 2}, iterations=300, seed=5)
        assert a == b


class TestSeparator:
    @given(random_graphs())
    @settings(max_examples=30, deadline=None)
    def test_valid_order(self, g):
        assert g.is_valid_order(separator(g, {0}))

    def test_singleton(self):
        g = DepGraph(n=1, edges=(), sizes=(1.0,), scores=(1.0,))
        assert separator(g, set()) == [0]

    def test_deterministic(self):
        g = fig8_graph()
        assert separator(g, {0, 2}) == separator(g, {0, 2})
