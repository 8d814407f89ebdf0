"""Per-node correctness: every MV of every Table III workload, computed
by Spark through the workload chain, must equal DuckDB's evaluation of
the same SQL over the same inputs (repro.oracle.assert_equivalent).

This is the core correctness guarantee of the reproduction: the
substrate S/C reorders and short-circuits must produce *exactly* the
declared MV contents (~100 parameterized tests, one per node).
"""
import pytest

from repro.oracle import assert_equivalent
from repro.workloads.tpcds import all_workloads
from tests.conftest import duck_chain, spark_chain

WLS = all_workloads()
CASES = [
    pytest.param(wname, nd.name, id=f"{wname}-{nd.name}")
    for wname, wl in WLS.items()
    for nd in wl.nodes
]


@pytest.mark.parametrize("wname,node", CASES)
def test_node_matches_duckdb(spark, tpcds_base, tpcds_pdfs, wname, node):
    wl = WLS[wname]
    chain = spark_chain(spark, wl, tpcds_base)
    duck = duck_chain(wl, tpcds_pdfs)
    nd = wl.node(node)
    inputs = {t: tpcds_pdfs[t] for t in wl.base_tables}
    inputs.update({p: duck[p] for p in nd.parents})
    assert_equivalent(chain[node], nd.sql, **inputs)
