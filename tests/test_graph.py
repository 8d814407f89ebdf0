"""Unit tests for the dependency-graph model (repro.core.graph)."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.graph import DepGraph, Plan, positions


def chain(n, sizes=None, scores=None):
    return DepGraph(
        n=n,
        edges=tuple((i, i + 1) for i in range(n - 1)),
        sizes=tuple(sizes or [1.0] * n),
        scores=tuple(scores or [1.0] * n),
    )


def diamond():
    #   0 -> 1 -> 3 ; 0 -> 2 -> 3
    return DepGraph(
        n=4,
        edges=((0, 1), (0, 2), (1, 3), (2, 3)),
        sizes=(4.0, 2.0, 1.0, 3.0),
        scores=(10.0, 5.0, 2.0, 1.0),
    )


@st.composite
def random_dags(draw):
    n = draw(st.integers(2, 12))
    edges = set()
    for v in range(1, n):
        for u in range(v):
            if draw(st.booleans()):
                edges.add((u, v))
    sizes = tuple(draw(st.floats(0.5, 10)) for _ in range(n))
    scores = tuple(draw(st.floats(0.0, 10)) for _ in range(n))
    return DepGraph(n=n, edges=tuple(sorted(edges)), sizes=sizes, scores=scores)


class TestConstruction:
    def test_rejects_cycle(self):
        with pytest.raises(ValueError, match="cycle"):
            DepGraph(n=2, edges=((0, 1), (1, 0)), sizes=(1, 1), scores=(1, 1))

    def test_rejects_self_loop(self):
        with pytest.raises(ValueError, match="self-loop"):
            DepGraph(n=1, edges=((0, 0),), sizes=(1,), scores=(1,))

    def test_rejects_out_of_range_edge(self):
        with pytest.raises(ValueError, match="out of range"):
            DepGraph(n=2, edges=((0, 5),), sizes=(1, 1), scores=(1, 1))

    def test_rejects_bad_sizes_len(self):
        with pytest.raises(ValueError, match="length"):
            DepGraph(n=3, edges=(), sizes=(1, 1), scores=(1, 1, 1))

    def test_rejects_bad_names_len(self):
        with pytest.raises(ValueError, match="names"):
            DepGraph(n=2, edges=(), sizes=(1, 1), scores=(1, 1), names=("a",))

    def test_adjacency(self):
        g = diamond()
        assert g.children(0) == (1, 2)
        assert g.parents(3) == (1, 2)
        assert g.roots() == [0]

    def test_names_default(self):
        g = chain(2)
        assert g.name(1) == "v1"

    def test_names_explicit(self):
        g = DepGraph(n=1, edges=(), sizes=(1,), scores=(1,), names=("mv",))
        assert g.name(0) == "mv"


class TestTopologicalOrder:
    def test_chain(self):
        assert chain(5).topological_order() == [0, 1, 2, 3, 4]

    def test_diamond_valid(self):
        g = diamond()
        order = g.topological_order()
        assert g.is_valid_order(order)

    def test_deterministic(self):
        g = diamond()
        assert g.topological_order() == g.topological_order()

    def test_is_valid_order_rejects_violation(self):
        assert not diamond().is_valid_order([1, 0, 2, 3])

    def test_is_valid_order_rejects_non_permutation(self):
        assert not diamond().is_valid_order([0, 0, 1, 2])

    @given(random_dags())
    @settings(max_examples=50, deadline=None)
    def test_topo_always_valid(self, g):
        assert g.is_valid_order(g.topological_order())


class TestMemoryAccounting:
    def test_release_positions_chain(self):
        g = chain(3)
        # node 0 released after child 1 runs (pos 1); node 2 childless
        # -> held to the end of the run (write-completion bound).
        assert g.release_positions([0, 1, 2]) == [1, 2, 2]

    def test_childless_resident_until_end(self):
        # Childless flagged nodes stay until the run ends (their async
        # write bounds the release) — so two of them coexist.
        g = DepGraph(n=2, edges=(), sizes=(5.0, 7.0), scores=(1, 1))
        assert g.memory_profile([0, 1], [0, 1]) == [5.0, 12.0]

    def test_memory_profile_chain_overlap(self):
        g = chain(3, sizes=[10, 20, 30])
        # flag 0 and 1: at step1 both resident (0 until child at 1 runs)
        assert g.memory_profile([0, 1], [0, 1, 2]) == [10.0, 30.0, 20.0]

    def test_peak_memory(self):
        g = chain(3, sizes=[10, 20, 30])
        assert g.peak_memory([0, 1], [0, 1, 2]) == 30.0

    def test_average_memory(self):
        g = chain(3, sizes=[10, 20, 30])
        assert g.average_memory([0, 1], [0, 1, 2]) == pytest.approx(20.0)

    def test_empty_flagged_zero(self):
        g = diamond()
        order = g.topological_order()
        assert g.peak_memory([], order) == 0.0
        assert g.average_memory([], order) == 0.0

    def test_feasibility_boundary(self):
        g = chain(2, sizes=[10, 10])
        assert g.is_feasible([0], [0, 1], 10)
        assert not g.is_feasible([0, 1], [0, 1], 10)  # coexist at step 1

    def test_order_changes_residency(self):
        # 0 -> 2; order [0,1,2] keeps 0 resident 3 steps; [0,2,1] only 2.
        g = DepGraph(
            n=3, edges=((0, 2),), sizes=(10.0, 1.0, 1.0), scores=(1, 1, 1)
        )
        assert g.memory_profile([0], [0, 1, 2]) == [10.0, 10.0, 10.0]
        assert g.memory_profile([0], [0, 2, 1]) == [10.0, 10.0, 0.0]

    def test_total_score(self):
        assert diamond().total_score([0, 2]) == 12.0

    @given(random_dags())
    @settings(max_examples=50, deadline=None)
    def test_profile_nonnegative_and_peak_consistent(self, g):
        order = g.topological_order()
        flagged = list(range(0, g.n, 2))
        prof = g.memory_profile(flagged, order)
        assert all(p >= -1e-9 for p in prof)
        assert g.peak_memory(flagged, order) == pytest.approx(max(prof))
        avg = g.average_memory(flagged, order)
        assert avg == pytest.approx(sum(prof) / g.n)

    @given(random_dags())
    @settings(max_examples=50, deadline=None)
    def test_resident_sets_match_profile(self, g):
        order = g.topological_order()
        res = g.resident_sets(order)
        flagged = set(range(g.n))
        prof = g.memory_profile(flagged, order)
        for p in range(g.n):
            assert sum(g.sizes[v] for v in res[p]) == pytest.approx(prof[p])


class TestHelpers:
    def test_positions_inverse(self):
        assert positions([2, 0, 1]) == [1, 2, 0]

    def test_plan_describe_marks_flagged(self):
        g = diamond()
        s = Plan((0, 1, 2, 3), frozenset({1})).describe(g)
        assert "v1*" in s and "v0*" not in s
