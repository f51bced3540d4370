"""Synthetic data generators: determinism, referential integrity, skew."""
import numpy as np
import pandas as pd

from repro import synth_data as sd


class TestTpchLite:
    def test_all_eight_tables(self):
        t = sd.tpch_tables_pdf(0.001)
        assert set(t) == {
            "lineitem", "orders", "customer", "part", "supplier",
            "partsupp", "nation", "region",
        }

    def test_deterministic(self):
        a = sd.lineitem_pdf(0.001)
        b = sd.lineitem_pdf(0.001)
        pd.testing.assert_frame_equal(a, b)

    def test_scaling(self):
        small = len(sd.orders_pdf(0.001))
        big = len(sd.orders_pdf(0.002))
        assert big == 2 * small

    def test_foreign_keys_in_range(self):
        t = sd.tpch_tables_pdf(0.002)
        li, o, c = t["lineitem"], t["orders"], t["customer"]
        assert li["l_orderkey"].max() <= o["o_orderkey"].max()
        assert o["o_custkey"].max() <= c["c_custkey"].max()
        assert li["l_suppkey"].max() <= t["supplier"]["s_suppkey"].max()
        assert li["l_partkey"].max() <= t["part"]["p_partkey"].max()

    def test_nation_region(self):
        n, r = sd.nation_pdf(), sd.region_pdf()
        assert len(n) == 25 and len(r) == 5
        assert set(n["n_regionkey"]) <= set(r["r_regionkey"])

    def test_dates_are_datetimes(self):
        li = sd.lineitem_pdf(0.001)
        for col in ("l_shipdate", "l_commitdate", "l_receiptdate"):
            assert str(li[col].dtype).startswith("datetime64")

    def test_table_bytes_positive(self):
        b = sd.tpch_table_bytes(0.001)
        assert all(v > 0 for v in b.values())
        assert b["lineitem"] > b["nation"]


class TestWorkloadData:
    def test_tpcxai_skew(self):
        tx = sd.tpcxai_transactions_pdf(0.01)
        counts = tx["customer_id"].value_counts()
        # Zipf: the hottest customer dwarfs the median
        assert counts.iloc[0] > 20 * counts.median()

    def test_tpcxai_join_keys(self):
        tx = sd.tpcxai_transactions_pdf(0.01)
        cust = sd.tpcxai_customers_pdf(0.01)
        assert set(tx["customer_id"]).issubset(set(cust["customer_id"]))

    def test_census_shape(self):
        c = sd.census_pdf(0.001)
        assert {"age", "workclass", "income_gt_50k"} <= set(c.columns)
        assert c["income_gt_50k"].isin([0, 1]).all()

    def test_plasticc_shape(self):
        p = sd.plasticc_pdf(0.001)
        assert {"object_id", "passband", "flux", "detected"} <= set(p.columns)
        assert p["passband"].between(0, 5).all()

    def test_zipf_uniform_generators(self, spark):
        z = sd.zipf_keys(spark, n=1000, n_keys=100).toPandas()
        u = sd.uniform_keys(spark, n=1000, n_keys=100).toPandas()
        assert z["k"].value_counts().iloc[0] > u["k"].value_counts().iloc[0]

    def test_spark_wrappers(self, spark):
        df = sd.lineitem(spark, sf=0.001)
        assert df.count() == len(sd.lineitem_pdf(0.001))
