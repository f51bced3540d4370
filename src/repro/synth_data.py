"""Synthetic OLAP data at a configurable scale factor.

SF=1.0 is roughly TPC-H SF1 (~1 GB across tables). Tests use SF<=0.01;
benchmarks use SF~=0.1. Generators are deterministic in ``seed`` so the
DuckDB oracle sees identical input.

Extended for the Xorbits reproduction (DESIGN.md § 3) with:

* the full TPC-H-**lite** schema — the original four tables gain the
  columns the 22 queries touch (categorical stand-ins for TPC-H's text
  predicates), plus ``supplier``/``partsupp``/``nation``/``region``;
  ``tpch_tables_pdf`` returns all eight as pandas frames;
* ``tpcxai_transactions`` — the paper's TPCx-AI UC10 case: a huge,
  Zipf-skewed financial-transaction fact joined against a tiny customer
  dimension (the data-imbalance scenario of Section VI-B);
* ``census_pdf`` / ``plasticc_pdf`` — stand-ins for the two Kaggle
  pipelines (categorical/income frame; light-curve time series).

Pandas variants (``*_pdf``) feed the engines; the original Spark-
returning functions remain for Spark-side tests.
"""
import functools

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

_N_LINEITEM_PER_SF = 6_000_000
_N_ORDERS_PER_SF = 1_500_000
_N_CUSTOMER_PER_SF = 150_000
_N_PART_PER_SF = 200_000
_N_SUPPLIER_PER_SF = 10_000
_N_PARTSUPP_PER_SF = 800_000

_NATIONS = [
    "ALGERIA", "ARGENTINA", "BRAZIL", "CANADA", "EGYPT", "ETHIOPIA",
    "FRANCE", "GERMANY", "INDIA", "INDONESIA", "IRAN", "IRAQ", "JAPAN",
    "JORDAN", "KENYA", "MOROCCO", "MOZAMBIQUE", "PERU", "CHINA",
    "ROMANIA", "SAUDI ARABIA", "VIETNAM", "RUSSIA", "UNITED KINGDOM",
    "UNITED STATES",
]
_REGIONS = ["AFRICA", "AMERICA", "ASIA", "EUROPE", "MIDDLE EAST"]
_NATION_REGION = [0, 1, 1, 1, 4, 0, 3, 3, 2, 2, 4, 4, 2, 4, 0, 0, 0, 1, 2, 3, 4, 2, 3, 3, 1]


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


@functools.lru_cache(maxsize=8)
def lineitem_pdf(sf: float = 0.01, seed: int = 0) -> pd.DataFrame:
    n = max(1, int(_N_LINEITEM_PER_SF * sf))
    n_orders = max(1, int(_N_ORDERS_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    n_supp = max(1, int(_N_SUPPLIER_PER_SF * sf))
    g = _rng(seed)
    ship = pd.to_datetime("1992-01-01") + pd.to_timedelta(
        g.integers(0, 2557, n), unit="D"
    )
    return pd.DataFrame(
        {
            "l_orderkey": g.integers(1, n_orders + 1, n),
            "l_partkey": g.integers(1, n_part + 1, n),
            "l_suppkey": g.integers(1, n_supp + 1, n),
            "l_linenumber": g.integers(1, 8, n),
            "l_quantity": g.integers(1, 51, n).astype("float64"),
            "l_extendedprice": (g.random(n) * 90000 + 900).round(2),
            "l_discount": (g.random(n) * 0.1).round(2),
            "l_tax": (g.random(n) * 0.08).round(2),
            "l_returnflag": g.choice(list("NRA"), n),
            "l_linestatus": g.choice(list("OF"), n),
            "l_shipdate": ship,
            "l_commitdate": ship + pd.to_timedelta(g.integers(-30, 60, n), unit="D"),
            "l_receiptdate": ship + pd.to_timedelta(g.integers(1, 31, n), unit="D"),
            "l_shipmode": g.choice(
                ["AIR", "MAIL", "SHIP", "TRUCK", "RAIL", "REG AIR", "FOB"], n
            ),
            "l_shipinstruct": g.choice(
                ["DELIVER IN PERSON", "COLLECT COD", "NONE", "TAKE BACK RETURN"], n
            ),
        }
    )


@functools.lru_cache(maxsize=8)
def orders_pdf(sf: float = 0.01, seed: int = 1) -> pd.DataFrame:
    n = max(1, int(_N_ORDERS_PER_SF * sf))
    n_cust = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    return pd.DataFrame(
        {
            "o_orderkey": np.arange(1, n + 1),
            "o_custkey": g.integers(1, n_cust + 1, n),
            "o_orderstatus": g.choice(list("OFP"), n),
            "o_totalprice": (g.random(n) * 500000 + 1000).round(2),
            "o_orderdate": pd.to_datetime("1992-01-01")
            + pd.to_timedelta(g.integers(0, 2406, n), unit="D"),
            "o_orderpriority": g.choice(
                ["1-URGENT", "2-HIGH", "3-MEDIUM", "4-NOT", "5-LOW"], n
            ),
            "o_shippriority": np.zeros(n, dtype="int64"),
            # lite stand-in for TPC-H's o_comment LIKE '%special%requests%'
            "o_special": (g.random(n) < 0.1).astype("int64"),
        }
    )


@functools.lru_cache(maxsize=8)
def part_pdf(sf: float = 0.01, seed: int = 5) -> pd.DataFrame:
    n = max(1, int(_N_PART_PER_SF * sf))
    g = _rng(seed)
    return pd.DataFrame(
        {
            "p_partkey": np.arange(1, n + 1),
            "p_type": g.choice(
                ["STANDARD", "SMALL", "MEDIUM", "LARGE", "ECONOMY", "PROMO"], n
            ),
            "p_brand": g.choice(
                [f"Brand#{i}{j}" for i in range(1, 6) for j in range(1, 6)], n
            ),
            "p_size": g.integers(1, 51, n),
            "p_retailprice": (900 + (np.arange(1, n + 1) % 1000) / 10.0).round(2),
            "p_mfgr": g.choice([f"Manufacturer#{i}" for i in range(1, 6)], n),
            "p_container": g.choice(
                ["SM CASE", "SM BOX", "MED BAG", "MED BOX", "LG CASE",
                 "LG BOX", "JUMBO PKG", "WRAP JAR"], n
            ),
            # lite stand-in for p_name LIKE '%green%'
            "p_color": g.choice(
                ["green", "red", "blue", "ivory", "navy",
                 "plum", "khaki", "puff", "rose", "snow"], n
            ),
        }
    )


@functools.lru_cache(maxsize=8)
def customer_pdf(sf: float = 0.01, seed: int = 2) -> pd.DataFrame:
    n = max(1, int(_N_CUSTOMER_PER_SF * sf))
    g = _rng(seed)
    return pd.DataFrame(
        {
            "c_custkey": np.arange(1, n + 1),
            "c_nationkey": g.integers(0, 25, n),
            "c_acctbal": (g.random(n) * 10000 - 1000).round(2),
            "c_mktsegment": g.choice(
                ["BUILDING", "AUTOMOBILE", "MACHINERY", "HOUSEHOLD", "FURNITURE"], n
            ),
            # lite stand-in for substring(c_phone, 1, 2): country code
            "c_phone_cc": g.integers(10, 35, n),
        }
    )


@functools.lru_cache(maxsize=8)
def supplier_pdf(sf: float = 0.01, seed: int = 6) -> pd.DataFrame:
    n = max(1, int(_N_SUPPLIER_PER_SF * sf))
    g = _rng(seed)
    return pd.DataFrame(
        {
            "s_suppkey": np.arange(1, n + 1),
            "s_nationkey": g.integers(0, 25, n),
            "s_acctbal": (g.random(n) * 10000 - 1000).round(2),
            # lite stand-in for s_comment LIKE '%Customer%Complaints%'
            "s_complaint": (g.random(n) < 0.05).astype("int64"),
        }
    )


@functools.lru_cache(maxsize=8)
def partsupp_pdf(sf: float = 0.01, seed: int = 7) -> pd.DataFrame:
    n = max(1, int(_N_PARTSUPP_PER_SF * sf))
    n_part = max(1, int(_N_PART_PER_SF * sf))
    n_supp = max(1, int(_N_SUPPLIER_PER_SF * sf))
    g = _rng(seed)
    return pd.DataFrame(
        {
            "ps_partkey": g.integers(1, n_part + 1, n),
            "ps_suppkey": g.integers(1, n_supp + 1, n),
            "ps_supplycost": (g.random(n) * 1000 + 1).round(2),
            "ps_availqty": g.integers(1, 10000, n),
        }
    )


def nation_pdf(sf: float = 0.01, seed: int = 8) -> pd.DataFrame:
    return pd.DataFrame(
        {
            "n_nationkey": np.arange(25),
            "n_name": _NATIONS,
            "n_regionkey": np.array(_NATION_REGION, dtype="int64"),
        }
    )


def region_pdf(sf: float = 0.01, seed: int = 9) -> pd.DataFrame:
    return pd.DataFrame(
        {"r_regionkey": np.arange(5), "r_name": _REGIONS}
    )


_TPCH_GENERATORS = {
    "lineitem": lineitem_pdf,
    "orders": orders_pdf,
    "customer": customer_pdf,
    "part": part_pdf,
    "supplier": supplier_pdf,
    "partsupp": partsupp_pdf,
    "nation": nation_pdf,
    "region": region_pdf,
}


def tpch_tables_pdf(sf: float = 0.01, tables=None) -> dict:
    """All (or the named) TPC-H-lite tables as pandas frames."""
    names = tables or list(_TPCH_GENERATORS)
    return {name: _TPCH_GENERATORS[name](sf) for name in names}


def tpch_table_bytes(sf: float = 0.01) -> dict:
    """Real in-memory bytes per table — calibrates the memory model."""
    return {
        name: int(pdf.memory_usage(index=True, deep=True).sum())
        for name, pdf in tpch_tables_pdf(sf).items()
    }


# -- spark-returning wrappers (original public API) -------------------------


def lineitem(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> DataFrame:
    return spark.createDataFrame(lineitem_pdf(sf, seed))


def orders(spark: SparkSession, *, sf: float = 0.01, seed: int = 1) -> DataFrame:
    return spark.createDataFrame(orders_pdf(sf, seed))


def part(spark: SparkSession, *, sf: float = 0.01, seed: int = 5) -> DataFrame:
    return spark.createDataFrame(part_pdf(sf, seed))


def customer(spark: SparkSession, *, sf: float = 0.01, seed: int = 2) -> DataFrame:
    return spark.createDataFrame(customer_pdf(sf, seed))


# -- workload datasets beyond TPC-H (DESIGN.md § 3) -------------------------


@functools.lru_cache(maxsize=4)
def tpcxai_customers_pdf(sf: float = 0.1, seed: int = 20) -> pd.DataFrame:
    """Tiny customer dimension of TPCx-AI UC10 (the paper's 3.2 MB file)."""
    n = max(10, int(2_000 * sf * 10))
    g = _rng(seed)
    return pd.DataFrame(
        {
            "customer_id": np.arange(1, n + 1),
            "risk_score": (g.random(n)).round(4),
            "segment": g.choice(["retail", "corporate", "private"], n),
        }
    )


@functools.lru_cache(maxsize=4)
def tpcxai_transactions_pdf(sf: float = 0.1, seed: int = 21,
                            alpha: float = 1.2) -> pd.DataFrame:
    """Huge, Zipf-skewed financial-transaction fact (the 34 GB file).

    The customer-ID skew is the point: a handful of customers own a large
    share of transactions, so a naive hash-join collapses onto one
    reducer — the imbalance the paper's Figure 8a case measures.
    """
    n = max(100, int(3_000_000 * sf))
    cust = tpcxai_customers_pdf(sf, seed - 1)
    n_cust = len(cust)
    g = _rng(seed)
    ranks = np.arange(1, n_cust + 1)
    w = 1.0 / ranks ** alpha
    w /= w.sum()
    return pd.DataFrame(
        {
            "transaction_id": np.arange(1, n + 1),
            "customer_id": g.choice(ranks, size=n, p=w),
            "amount": (g.random(n) * 10_000).round(2),
            "ts": pd.to_datetime("2020-01-01")
            + pd.to_timedelta(g.integers(0, 365 * 24 * 3600, n), unit="s"),
            "channel": g.choice(["web", "pos", "atm", "wire"], n),
        }
    )


@functools.lru_cache(maxsize=4)
def census_pdf(sf: float = 0.1, seed: int = 22) -> pd.DataFrame:
    """Census-like categorical/income frame (Kaggle 'census' stand-in)."""
    n = max(100, int(2_000_000 * sf))
    g = _rng(seed)
    return pd.DataFrame(
        {
            "age": g.integers(17, 91, n),
            "workclass": g.choice(
                ["Private", "Self-emp", "Federal-gov", "Local-gov", "?"], n
            ),
            "education_num": g.integers(1, 17, n),
            "marital": g.choice(["Married", "Never", "Divorced", "Widowed"], n),
            "hours_per_week": g.integers(1, 100, n),
            "capital_gain": np.where(g.random(n) < 0.08, g.integers(1, 100_000, n), 0),
            "income_gt_50k": (g.random(n) < 0.24).astype("int64"),
            "sex": g.choice(["Male", "Female"], n),
        }
    )


@functools.lru_cache(maxsize=4)
def plasticc_pdf(sf: float = 0.1, seed: int = 23) -> pd.DataFrame:
    """PLAsTiCC-like light curves (object_id, passband, mjd, flux)."""
    n = max(100, int(3_000_000 * sf))
    n_obj = max(10, n // 300)
    g = _rng(seed)
    return pd.DataFrame(
        {
            "object_id": g.integers(1, n_obj + 1, n),
            "mjd": (59_000 + g.random(n) * 1000).round(4),
            "passband": g.integers(0, 6, n),
            "flux": (g.normal(0, 100, n)).round(3),
            "flux_err": (np.abs(g.normal(0, 10, n)) + 0.1).round(3),
            "detected": (g.random(n) < 0.3).astype("int64"),
        }
    )


def zipf_keys(spark: SparkSession, *, n: int, n_keys: int, alpha: float = 1.1, seed: int = 3) -> DataFrame:
    """Skewed key column — for join-skew / cardinality-estimation papers."""
    g = _rng(seed)
    ranks = np.arange(1, n_keys + 1)
    weights = 1.0 / ranks**alpha
    weights /= weights.sum()
    keys = g.choice(ranks, size=n, p=weights)
    return spark.createDataFrame(pd.DataFrame({"k": keys, "v": g.random(n)}))


def uniform_keys(spark: SparkSession, *, n: int, n_keys: int, seed: int = 4) -> DataFrame:
    g = _rng(seed)
    return spark.createDataFrame(
        pd.DataFrame({"k": g.integers(1, n_keys + 1, n), "v": g.random(n)})
    )
