"""Unit tests for the synthetic workload generator (workloads.generator)."""
import pytest

from repro.core.graph import DepGraph
from repro.workloads.generator import (
    GenParams,
    TPCDS_100GB_TABLE_GB,
    generate_dag,
)


class TestStructure:
    @pytest.mark.parametrize("n", [5, 25, 50, 100])
    def test_exact_node_count(self, n):
        g = generate_dag(GenParams(n_nodes=n, seed=3))
        assert g.n == n

    def test_is_valid_dag(self):
        g = generate_dag(GenParams(n_nodes=60, seed=1))
        assert isinstance(g, DepGraph)
        assert g.topological_order() is not None

    def test_deterministic_in_seed(self):
        a = generate_dag(GenParams(n_nodes=40, seed=9))
        b = generate_dag(GenParams(n_nodes=40, seed=9))
        assert a.edges == b.edges and a.sizes == b.sizes

    def test_different_seeds_differ(self):
        a = generate_dag(GenParams(n_nodes=40, seed=1))
        b = generate_dag(GenParams(n_nodes=40, seed=2))
        assert a.edges != b.edges or a.sizes != b.sizes

    def test_non_roots_have_parents(self):
        g = generate_dag(GenParams(n_nodes=50, seed=4))
        roots = set(g.roots())
        for v in range(g.n):
            if v not in roots:
                assert g.parents(v)

    def test_root_sizes_from_tpcds_distribution(self):
        g = generate_dag(GenParams(n_nodes=50, seed=5))
        for r in g.roots():
            assert g.sizes[r] in TPCDS_100GB_TABLE_GB

    def test_scores_positive_when_children(self):
        g = generate_dag(GenParams(n_nodes=50, seed=6))
        for v in range(g.n):
            assert g.scores[v] > 0  # write-overlap term is always > 0

    def test_names_carry_operations(self):
        g = generate_dag(GenParams(n_nodes=30, seed=7))
        ops = {g.name(i).rstrip("0123456789") for i in range(g.n)}
        assert ops <= {"scan", "filter", "join", "agg", "union"}
        assert "scan" in ops


class TestParameters:
    def test_height_width_ratio_shapes_dag(self):
        tall = generate_dag(GenParams(n_nodes=64, height_width_ratio=4.0, seed=0))
        wide = generate_dag(GenParams(n_nodes=64, height_width_ratio=0.25, seed=0))
        # taller DAG -> fewer roots (narrower stages)
        assert len(tall.roots()) < len(wide.roots())

    def test_max_outdegree_zero_allows_minimum_edges(self):
        g = generate_dag(GenParams(n_nodes=30, max_outdegree=0, seed=0))
        # every non-root still gets >= 1 parent via fallback
        assert g.topological_order() is not None

    def test_higher_outdegree_more_edges(self):
        lo = generate_dag(GenParams(n_nodes=80, max_outdegree=1, seed=0))
        hi = generate_dag(GenParams(n_nodes=80, max_outdegree=8, seed=0))
        assert len(hi.edges) >= len(lo.edges)

    def test_stage_stdev_perturbs_structure(self):
        a = generate_dag(GenParams(n_nodes=60, stage_stdev=0.0, seed=2))
        b = generate_dag(GenParams(n_nodes=60, stage_stdev=4.0, seed=2))
        assert a.n == b.n == 60

    def test_agg_outputs_smaller_than_inputs(self):
        g = generate_dag(GenParams(n_nodes=80, seed=11))
        for v in range(g.n):
            if g.name(v).startswith("agg") and g.parents(v):
                biggest_in = max(g.sizes[p] for p in g.parents(v))
                assert g.sizes[v] <= biggest_in
