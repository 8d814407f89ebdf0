"""Unit tests for SimplifiedMKP and baseline selectors (repro.core.flagging)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.flagging import (
    greedy_flag,
    random_flag,
    ratio_flag,
    simplified_mkp,
)
from repro.core.graph import DepGraph


def fig7_graph():
    """The paper's Fig. 7 shape (see tests/test_alternating.py)."""
    return DepGraph(
        n=6,
        edges=((0, 1), (0, 3), (1, 2), (2, 4), (4, 5)),
        sizes=(100.0, 5.0, 100.0, 5.0, 10.0, 10.0),
        scores=(100.0, 5.0, 100.0, 5.0, 10.0, 10.0),
    )


@st.composite
def random_graphs(draw):
    n = draw(st.integers(2, 10))
    edges = set()
    for v in range(1, n):
        for u in range(v):
            if draw(st.booleans()):
                edges.add((u, v))
    sizes = tuple(float(draw(st.integers(1, 10))) for _ in range(n))
    scores = tuple(float(draw(st.integers(0, 10))) for _ in range(n))
    return DepGraph(n=n, edges=tuple(sorted(edges)), sizes=sizes, scores=scores)


ALL_SELECTORS = [simplified_mkp, greedy_flag, random_flag, ratio_flag]


class TestSimplifiedMKP:
    def test_fig7_tau1(self):
        g = fig7_graph()
        u = simplified_mkp(g, [0, 1, 2, 3, 4, 5], 100)
        assert g.total_score(u) == 120.0  # paper: v1, v5, v6

    def test_fig7_tau2(self):
        g = fig7_graph()
        u = simplified_mkp(g, [0, 1, 3, 2, 4, 5], 100)
        assert g.total_score(u) == 210.0  # paper: v1, v3, v6

    def test_oversize_never_flagged(self):
        g = DepGraph(n=2, edges=((0, 1),), sizes=(50.0, 1.0), scores=(9.0, 1.0))
        u = simplified_mkp(g, [0, 1], 10)
        assert 0 not in u and 1 in u

    def test_zero_score_never_flagged(self):
        g = DepGraph(n=2, edges=((0, 1),), sizes=(1.0, 1.0), scores=(0.0, 1.0))
        u = simplified_mkp(g, [0, 1], 10)
        assert 0 not in u

    def test_unconstrained_nodes_trivially_flagged(self):
        # Everything fits -> no constraint sets -> all (score>0) flagged.
        g = DepGraph(n=3, edges=((0, 1),), sizes=(1.0, 1.0, 1.0),
                     scores=(1.0, 1.0, 1.0))
        u = simplified_mkp(g, [0, 1, 2], 100)
        assert u == frozenset({0, 1, 2})

    def test_dominates_greedy(self):
        g = fig7_graph()
        order = [0, 1, 3, 2, 4, 5]
        assert g.total_score(simplified_mkp(g, order, 100)) >= g.total_score(
            greedy_flag(g, order, 100)
        )

    @given(random_graphs(), st.integers(1, 30))
    @settings(max_examples=40, deadline=None)
    def test_always_feasible(self, g, budget):
        order = g.topological_order()
        u = simplified_mkp(g, order, budget)
        assert g.is_feasible(u, order, budget)

    @given(random_graphs(), st.integers(1, 30))
    @settings(max_examples=40, deadline=None)
    def test_dominates_all_baselines(self, g, budget):
        order = g.topological_order()
        mkp_score = g.total_score(simplified_mkp(g, order, budget))
        for sel in (greedy_flag, random_flag, ratio_flag):
            assert mkp_score >= g.total_score(sel(g, order, budget)) - 1e-9


class TestBaselines:
    @pytest.mark.parametrize("sel", [greedy_flag, random_flag, ratio_flag])
    def test_feasible(self, sel):
        g = fig7_graph()
        order = [0, 1, 2, 3, 4, 5]
        assert g.is_feasible(sel(g, order, 100), order, 100)

    def test_greedy_takes_execution_order(self):
        # greedy flags node 0 first, blocking the better pair {1, 2}.
        g = DepGraph(
            n=3,
            edges=((0, 1), (0, 2), (1, 2)),
            sizes=(6.0, 5.0, 5.0),
            scores=(1.0, 10.0, 10.0),
        )
        u = greedy_flag(g, [0, 1, 2], 10)
        assert u == frozenset({0})  # 0 resident while 1 runs -> 1 blocked

    def test_ratio_prefers_density(self):
        g = DepGraph(
            n=3,
            edges=((0, 1), (0, 2), (1, 2)),
            sizes=(6.0, 5.0, 5.0),
            scores=(1.0, 10.0, 10.0),
        )
        u = ratio_flag(g, [0, 1, 2], 10)
        assert 1 in u  # density 2.0 beats node 0's 0.17

    def test_random_deterministic_in_seed(self):
        g = fig7_graph()
        order = [0, 1, 2, 3, 4, 5]
        assert random_flag(g, order, 100, seed=7) == random_flag(
            g, order, 100, seed=7
        )

    def test_random_skips_oversize(self):
        g = DepGraph(n=1, edges=(), sizes=(50.0,), scores=(1.0,))
        assert random_flag(g, [0], 10) == frozenset()
