"""Structural tests for the five Table III workload DAGs (workloads.tpcds)."""
import pytest

from repro.workloads.spec import MVSpec, WorkloadSpec
from repro.workloads.tpcds import PAPER_TABLE3, all_workloads

WLS = all_workloads()


class TestSpecValidation:
    def test_duplicate_name_rejected(self):
        with pytest.raises(ValueError, match="duplicate"):
            WorkloadSpec(
                "w",
                (MVSpec("a", "SELECT 1"), MVSpec("a", "SELECT 2")),
                (),
            )

    def test_undeclared_parent_rejected(self):
        with pytest.raises(ValueError, match="not declared earlier"):
            WorkloadSpec(
                "w",
                (MVSpec("a", "SELECT * FROM b", ("b",)),),
                (),
            )

    def test_node_lookup(self):
        wl = WLS["io1_profit_report"]
        assert wl.node("all_profit").name == "all_profit"
        with pytest.raises(KeyError):
            wl.node("nope")


@pytest.mark.parametrize("name", list(WLS))
class TestTableIIIStructure:
    def test_node_count_matches_paper(self, name):
        assert len(WLS[name].nodes) == PAPER_TABLE3[name]["nodes"]

    def test_acyclic_and_orderable(self, name):
        wl = WLS[name]
        g = wl.to_depgraph(
            {n: 1.0 for n in wl.node_names}, {n: 1.0 for n in wl.node_names}
        )
        assert g.topological_order() is not None

    def test_declared_parents_match_sql_references(self, name):
        wl = WLS[name]
        for nd in wl.nodes:
            refs = wl.referenced_tables(nd)
            assert refs - set(wl.base_tables) == set(nd.parents), nd.name

    def test_every_mv_is_consumed_or_terminal(self, name):
        # no dangling scratch nodes: every non-terminal MV has a child
        wl = WLS[name]
        consumed = {p for nd in wl.nodes for p in nd.parents}
        terminals = [n for n in wl.node_names if n not in consumed]
        assert 1 <= len(terminals) <= 8

    def test_roots_read_base_tables_only(self, name):
        wl = WLS[name]
        for nd in wl.nodes:
            if not nd.parents:
                assert wl.referenced_tables(nd) <= set(wl.base_tables)

    def test_depgraph_edges_count(self, name):
        wl = WLS[name]
        n_edges = sum(len(nd.parents) for nd in wl.nodes)
        assert len(wl.edges()) == n_edges


class TestTotals:
    def test_total_nodes(self):
        assert sum(len(w.nodes) for w in WLS.values()) == 103

    def test_workload_names_ordered_as_paper(self):
        assert [PAPER_TABLE3[n]["label"] for n in WLS] == [
            "I/O 1", "I/O 2", "I/O 3", "Compute 1", "Compute 2",
        ]

    def test_unique_mv_names_within_workload(self):
        for wl in WLS.values():
            assert len(set(wl.node_names)) == len(wl.node_names)
