"""Unit tests for constraint generation (repro.core.constraints)."""
import pytest

from repro.core.constraints import excluded_nodes, get_constraints
from repro.core.graph import DepGraph


def chain(n, sizes, scores=None):
    return DepGraph(
        n=n,
        edges=tuple((i, i + 1) for i in range(n - 1)),
        sizes=tuple(sizes),
        scores=tuple(scores or [1.0] * n),
    )


class TestExclusion:
    def test_oversize_excluded(self):
        g = chain(3, [5, 50, 5])
        assert excluded_nodes(g, 10) == {1}

    def test_zero_score_excluded(self):
        g = chain(3, [1, 1, 1], scores=[1, 0, 1])
        assert excluded_nodes(g, 10) == {1}

    def test_none_excluded(self):
        g = chain(2, [1, 1])
        assert excluded_nodes(g, 10) == set()

    def test_both_rules(self):
        g = chain(3, [50, 1, 1], scores=[1, 0, 1])
        assert excluded_nodes(g, 10) == {0, 1}


class TestConstraintSets:
    def test_trivial_sets_dropped(self):
        # Everything fits at once -> no constraints at all.
        g = chain(3, [1, 1, 1])
        assert get_constraints(g, [0, 1, 2], 100) == []

    def test_nontrivial_set_kept(self):
        g = chain(2, [6, 6])
        cons = get_constraints(g, [0, 1], 10)
        assert cons == [frozenset({0, 1})]

    def test_excluded_nodes_not_in_sets(self):
        g = chain(3, [6, 60, 6])
        cons = get_constraints(g, [0, 1, 2], 10)
        for c in cons:
            assert 1 not in c

    def test_maximality(self):
        # chain of 3, each step's resident set nested: only the largest kept.
        g = DepGraph(
            n=3,
            edges=((0, 2), (1, 2)),
            sizes=(6.0, 6.0, 6.0),
            scores=(1.0, 1.0, 1.0),
        )
        cons = get_constraints(g, [0, 1, 2], 10)
        # at step2 all three resident; steps 0/1 are subsets
        assert cons == [frozenset({0, 1, 2})]

    def test_sets_reflect_release(self):
        # 0 -> 1 ; 2 independent. Order [0,1,2]: 0 released after step 1,
        # so {0,2} never coexist.
        g = DepGraph(
            n=3, edges=((0, 1),), sizes=(6.0, 6.0, 6.0), scores=(1, 1, 1)
        )
        cons = get_constraints(g, [0, 1, 2], 10)
        assert frozenset({0, 1}) in cons
        assert all(not ({0, 2} <= c) for c in cons)

    def test_order_dependence(self):
        g = DepGraph(
            n=3, edges=((0, 2),), sizes=(6.0, 6.0, 6.0), scores=(1, 1, 1)
        )
        cons_a = get_constraints(g, [0, 1, 2], 10)
        cons_b = get_constraints(g, [0, 2, 1], 10)
        # order a: 0 resident through step 2 (child 2); childless 1 held
        # to the end -> all three coexist at the last step
        assert set(cons_a) == {frozenset({0, 1, 2})}
        # order b: 0 released right after 2 at step 1; childless 1 and 2
        # coexist at the last step
        assert set(cons_b) == {frozenset({0, 2}), frozenset({1, 2})}

    def test_every_set_over_budget(self):
        g = chain(4, [6, 6, 6, 6])
        for c in get_constraints(g, [0, 1, 2, 3], 10):
            assert sum(g.sizes[v] for v in c) > 10

    @pytest.mark.parametrize("budget", [1, 5, 11, 100])
    def test_matches_bruteforce_resident_sets(self, budget):
        g = DepGraph(
            n=5,
            edges=((0, 1), (0, 3), (1, 2), (2, 4)),
            sizes=(4.0, 3.0, 2.0, 5.0, 1.0),
            scores=(1.0, 1.0, 0.0, 1.0, 1.0),
        )
        order = g.topological_order()
        excl = excluded_nodes(g, budget)
        raw = [
            frozenset(v for v in s if v not in excl)
            for s in g.resident_sets(order)
        ]
        raw = [
            c for c in raw if c and sum(g.sizes[v] for v in c) > budget
        ]
        expected = {
            c for c in raw if not any(c < d for d in raw)
        }
        assert set(get_constraints(g, order, budget)) == expected
