"""Tests for the TPC-DSp (date-partitioned) workload variant."""
import pytest

from repro.oracle import assert_equivalent
from repro.synth_data import tpcds_date_dim, tpcds_pandas, write_tpcds
from repro.workloads.tpcds import all_workloads
from tests.conftest import TEST_SF

PLAIN = all_workloads(False)
PART = all_workloads(True)


@pytest.fixture(scope="module")
def part_pdfs():
    """Partitioned-variant ground truth: facts carry an inline d_year."""
    tabs = tpcds_pandas(sf=TEST_SF)
    dd = tpcds_date_dim()[["d_date_sk", "d_year"]]
    for f, col in (
        ("store_sales", "ss_sold_date_sk"),
        ("catalog_sales", "cs_sold_date_sk"),
        ("web_sales", "ws_sold_date_sk"),
    ):
        tabs[f] = (
            tabs[f]
            .merge(dd, left_on=col, right_on="d_date_sk", how="left")
            .drop(columns=["d_date_sk"])
        )
    return tabs


@pytest.fixture(scope="module")
def part_base(spark, tmp_path_factory):
    out = tmp_path_factory.mktemp("tpcds_part")
    return write_tpcds(spark, str(out), sf=TEST_SF, partitioned=True)


class TestStructure:
    @pytest.mark.parametrize("name", list(PLAIN))
    def test_same_node_counts(self, name):
        assert len(PART[name].nodes) == len(PLAIN[name].nodes)

    def test_roots_filter_partition_column(self):
        for name in ("io1_profit_report", "io2_yoy_sales", "io3_item_ranking"):
            wl = PART[name]
            year_roots = [
                nd for nd in wl.nodes
                if not nd.parents and "d_year" in nd.sql
            ]
            assert year_roots
            for nd in year_roots:
                assert "f.d_year" in nd.sql

    def test_plain_roots_filter_via_date_dim(self):
        wl = PLAIN["io1_profit_report"]
        nd = wl.node("ss_sales_recent")
        assert "d.d_year" in nd.sql and "f.d_year" not in nd.sql

    def test_compute1_identical_in_both_variants(self):
        # W4 has no year-filtered roots -> variant changes nothing
        for a, b in zip(PLAIN["compute1_category"].nodes,
                        PART["compute1_category"].nodes):
            assert a.sql == b.sql


class TestResults:
    @pytest.mark.parametrize(
        "wname,node",
        [
            ("io1_profit_report", "ss_sales_recent"),
            ("io1_profit_report", "ws_sales_recent"),
            ("io2_yoy_sales", "cs_sales_y"),
            ("io3_item_ranking", "ss_line"),
            ("compute2_cross_channel", "ss_item_agg"),
        ],
    )
    def test_partitioned_roots_match_oracle(
        self, spark, part_base, part_pdfs, wname, node
    ):
        wl = PART[wname]
        for t, path in part_base.items():
            spark.read.parquet(path).createOrReplaceTempView(t)
        nd = wl.node(node)
        df = spark.sql(nd.sql)
        inputs = {t: part_pdfs[t] for t in wl.base_tables}
        assert_equivalent(df, nd.sql, **inputs)

    def test_partitioned_equals_plain_results(
        self, spark, part_base, tpcds_base
    ):
        """The variant rewrite must not change MV contents — only how
        the engine scans the facts."""
        for t, path in tpcds_base.items():
            spark.read.parquet(path).createOrReplaceTempView(t)
        plain = spark.sql(PLAIN["io1_profit_report"].node("ss_sales_recent").sql)
        a = plain.toPandas()
        for t, path in part_base.items():
            spark.read.parquet(path).createOrReplaceTempView(t)
        part = spark.sql(PART["io1_profit_report"].node("ss_sales_recent").sql)
        b = part.toPandas()
        key = ["ss_item_sk", "ss_customer_sk", "ss_ext_sales_price", "d_moy"]
        a = a.sort_values(key).reset_index(drop=True)
        b = b.sort_values(key).reset_index(drop=True)
        import pandas as pd

        pd.testing.assert_frame_equal(
            a[sorted(a.columns)], b[sorted(b.columns)], check_dtype=False
        )

    def test_partition_pruning_in_plan(self, spark, part_base):
        """Spark's plan for a partition-filtered root should read fewer
        partitions than the full table (static pruning on d_year)."""
        for t, path in part_base.items():
            spark.read.parquet(path).createOrReplaceTempView(t)
        nd = PART["io3_item_ranking"].node("ss_line")  # f.d_year = 2001
        plan = spark.sql(nd.sql)._jdf.queryExecution().executedPlan().toString()
        assert "d_year" in plan
