"""Unit tests for the TPC-DS-lite generators (repro.synth_data)."""
import numpy as np
import pytest

from repro.synth_data import (
    _N_DATES,
    tpcds_customer,
    tpcds_date_dim,
    tpcds_item,
    tpcds_pandas,
    tpcds_store,
)


@pytest.fixture(scope="module")
def tabs():
    return tpcds_pandas(sf=0.002, seed=0)


class TestShapes:
    def test_all_tables_present(self, tabs):
        assert set(tabs) == {
            "store_sales", "catalog_sales", "web_sales",
            "date_dim", "item", "store", "customer",
        }

    def test_fact_proportions(self, tabs):
        # TPC-DS channel ratio 4:2:1
        ss, cs, ws = (
            len(tabs["store_sales"]), len(tabs["catalog_sales"]),
            len(tabs["web_sales"]),
        )
        assert ss == 2 * cs == 4 * ws

    def test_scaling(self):
        small = tpcds_pandas(sf=0.002)
        big = tpcds_pandas(sf=0.004)
        assert len(big["store_sales"]) == 2 * len(small["store_sales"])

    def test_date_dim_fixed_window(self, tabs):
        dd = tabs["date_dim"]
        assert len(dd) == _N_DATES
        assert dd["d_year"].min() == 1998 and dd["d_year"].max() == 2002

    def test_store_fixed(self, tabs):
        assert len(tabs["store"]) == 12


class TestIntegrity:
    def test_deterministic(self):
        a = tpcds_pandas(sf=0.002, seed=0)
        b = tpcds_pandas(sf=0.002, seed=0)
        for t in a:
            assert a[t].equals(b[t])

    def test_seed_changes_data(self):
        a = tpcds_pandas(sf=0.002, seed=0)
        b = tpcds_pandas(sf=0.002, seed=1)
        assert not a["store_sales"].equals(b["store_sales"])

    @pytest.mark.parametrize(
        "fact,fk,dim,pk",
        [
            ("store_sales", "ss_sold_date_sk", "date_dim", "d_date_sk"),
            ("store_sales", "ss_item_sk", "item", "i_item_sk"),
            ("store_sales", "ss_customer_sk", "customer", "c_customer_sk"),
            ("store_sales", "ss_store_sk", "store", "s_store_sk"),
            ("catalog_sales", "cs_sold_date_sk", "date_dim", "d_date_sk"),
            ("catalog_sales", "cs_item_sk", "item", "i_item_sk"),
            ("web_sales", "ws_sold_date_sk", "date_dim", "d_date_sk"),
            ("web_sales", "ws_item_sk", "item", "i_item_sk"),
        ],
    )
    def test_foreign_keys_resolve(self, tabs, fact, fk, dim, pk):
        assert tabs[fact][fk].isin(set(tabs[dim][pk])).all()

    def test_measure_identities(self, tabs):
        ss = tabs["store_sales"]
        np.testing.assert_allclose(
            ss["ss_ext_sales_price"],
            (ss["ss_sales_price"] * ss["ss_quantity"]).round(2),
        )
        np.testing.assert_allclose(
            ss["ss_net_profit"],
            ((ss["ss_sales_price"] - ss["ss_wholesale_cost"])
             * ss["ss_quantity"]).round(2),
        )

    def test_item_categories(self, tabs):
        assert tabs["item"]["i_category"].nunique() == 10

    def test_surrogate_keys_dense(self, tabs):
        item = tabs["item"]
        assert (item["i_item_sk"].values == np.arange(1, len(item) + 1)).all()


class TestDimGenerators:
    def test_date_dim_quarters(self):
        dd = tpcds_date_dim()
        assert set(dd["d_qoy"]) == {1, 2, 3, 4}
        assert set(dd["d_moy"]) == set(range(1, 13))

    def test_item_min_size(self):
        assert len(tpcds_item(sf=1e-9)) == 200

    def test_customer_min_size(self):
        assert len(tpcds_customer(sf=1e-9)) == 100

    def test_store_states(self):
        assert tpcds_store()["s_state"].isin(
            ["TN", "CA", "IL", "NY", "TX", "WA"]
        ).all()


class TestSparkSide:
    def test_spark_frames_match_pandas(self, spark, tabs):
        from repro.synth_data import tpcds_tables

        sdfs = tpcds_tables(spark, sf=0.002, seed=0)
        assert sdfs["store_sales"].count() == len(tabs["store_sales"])
        got = (
            sdfs["item"].toPandas().sort_values("i_item_sk").reset_index(drop=True)
        )
        want = tabs["item"].sort_values("i_item_sk").reset_index(drop=True)
        assert (got["i_category"] == want["i_category"]).all()

    def test_write_partitioned_layout(self, spark, tmp_path):
        from repro.synth_data import write_tpcds

        paths = write_tpcds(spark, str(tmp_path), sf=0.002, partitioned=True)
        import os

        years = [
            d for d in os.listdir(paths["store_sales"]) if d.startswith("d_year=")
        ]
        assert len(years) == 5  # 1998..2002
        df = spark.read.parquet(paths["store_sales"])
        assert "d_year" in df.columns

    def test_partitioned_same_rowcount(self, spark, tmp_path):
        from repro.synth_data import write_tpcds

        plain = write_tpcds(spark, str(tmp_path / "a"), sf=0.002)
        part = write_tpcds(spark, str(tmp_path / "b"), sf=0.002, partitioned=True)
        a = spark.read.parquet(plain["web_sales"]).count()
        b = spark.read.parquet(part["web_sales"]).count()
        assert a == b
