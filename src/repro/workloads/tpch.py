"""The 22 TPC-H queries, re-expressed over the TPC-H-lite schema.

Each query is a :class:`Query` with

* ``fn(t)`` — a pandas-style implementation over a dict of dataframes.
  It is engine-agnostic: ``t`` may hold pandas frames, our lazy
  ``xpd.DataFrame``s, or ``pyspark.pandas`` frames; only the shared
  dataframe surface is used (filtering, assign, merge, groupby.agg,
  sort_values, head, scalar reductions).
* ``sql`` — the equivalent SQL, run by the DuckDB oracle and by Spark
  SQL in tests so every engine's result is checked against two
  independent implementations.
* ``tables`` — the input tables it touches (drives the memory model:
  pandas must resident the full tables it loads).

Lite-ification (DESIGN.md § 3): TPC-H's free-text predicates become
categorical equality on stand-in columns (``p_color`` for
``p_name LIKE '%green%'``, ``o_special`` for the Q13 comment regex,
``s_complaint`` for Q16, ``c_phone_cc`` for Q22). Join/group/shuffle
structure — what Tables I/II measure — is preserved. Ordered queries
carry tie-breaking sort keys so results are deterministic across
engines.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Callable

import pandas as pd

DATE = pd.Timestamp


@dataclass
class Query:
    name: str
    fn: Callable
    sql: str
    tables: list = field(default_factory=list)


def _q01(t):
    li = t["lineitem"]
    f = li[li["l_shipdate"] <= DATE("1998-09-02")]
    f = f.assign(
        disc_price=f["l_extendedprice"] * (1 - f["l_discount"]),
        charge=f["l_extendedprice"] * (1 - f["l_discount"]) * (1 + f["l_tax"]),
    )
    r = (
        f.groupby(["l_returnflag", "l_linestatus"])
        .agg(
            sum_qty=("l_quantity", "sum"),
            sum_base_price=("l_extendedprice", "sum"),
            sum_disc_price=("disc_price", "sum"),
            sum_charge=("charge", "sum"),
            avg_qty=("l_quantity", "mean"),
            avg_price=("l_extendedprice", "mean"),
            avg_disc=("l_discount", "mean"),
            count_order=("l_quantity", "size"),
        )
        .reset_index()
    )
    return r.sort_values(["l_returnflag", "l_linestatus"])


_SQL01 = """
SELECT l_returnflag, l_linestatus,
       sum(l_quantity) AS sum_qty,
       sum(l_extendedprice) AS sum_base_price,
       sum(l_extendedprice * (1 - l_discount)) AS sum_disc_price,
       sum(l_extendedprice * (1 - l_discount) * (1 + l_tax)) AS sum_charge,
       avg(l_quantity) AS avg_qty,
       avg(l_extendedprice) AS avg_price,
       avg(l_discount) AS avg_disc,
       count(*) AS count_order
FROM lineitem
WHERE l_shipdate <= TIMESTAMP '1998-09-02'
GROUP BY l_returnflag, l_linestatus
ORDER BY l_returnflag, l_linestatus
"""


def _q02(t):
    p, ps, s, n, r = t["part"], t["partsupp"], t["supplier"], t["nation"], t["region"]
    p = p[(p["p_size"] == 15) & (p["p_type"] == "LARGE")]
    s = s.merge(n, left_on="s_nationkey", right_on="n_nationkey")
    s = s.merge(r, left_on="n_regionkey", right_on="r_regionkey")
    s = s[s["r_name"] == "EUROPE"]
    j = ps.merge(p, left_on="ps_partkey", right_on="p_partkey")
    j = j.merge(s, left_on="ps_suppkey", right_on="s_suppkey")
    mn = (
        j.groupby("ps_partkey").agg(min_cost=("ps_supplycost", "min")).reset_index()
    )
    j = j.merge(mn, on="ps_partkey")
    j = j[j["ps_supplycost"] == j["min_cost"]]
    out = j[["s_acctbal", "n_name", "p_partkey", "p_mfgr", "s_suppkey"]]
    return out.sort_values(
        ["s_acctbal", "n_name", "p_partkey", "s_suppkey"], ascending=False
    ).head(100)


_SQL02 = """
WITH j AS (
  SELECT ps.*, p.p_partkey, p.p_mfgr, s.s_suppkey AS s_suppkey,
         s.s_acctbal, n.n_name
  FROM partsupp ps
  JOIN part p ON ps.ps_partkey = p.p_partkey
  JOIN supplier s ON ps.ps_suppkey = s.s_suppkey
  JOIN nation n ON s.s_nationkey = n.n_nationkey
  JOIN region r ON n.n_regionkey = r.r_regionkey
  WHERE p.p_size = 15 AND p.p_type = 'LARGE' AND r.r_name = 'EUROPE'
), mn AS (
  SELECT ps_partkey, min(ps_supplycost) AS min_cost FROM j GROUP BY ps_partkey
)
SELECT j.s_acctbal, j.n_name, j.p_partkey, j.p_mfgr, j.s_suppkey
FROM j JOIN mn ON j.ps_partkey = mn.ps_partkey
WHERE j.ps_supplycost = mn.min_cost
ORDER BY j.s_acctbal DESC, j.n_name DESC, j.p_partkey DESC, j.s_suppkey DESC
LIMIT 100
"""


def _q03(t):
    c, o, li = t["customer"], t["orders"], t["lineitem"]
    c = c[c["c_mktsegment"] == "BUILDING"]
    o = o[o["o_orderdate"] < DATE("1995-03-15")]
    li = li[li["l_shipdate"] > DATE("1995-03-15")]
    j = c.merge(o, left_on="c_custkey", right_on="o_custkey")
    j = j.merge(li, left_on="o_orderkey", right_on="l_orderkey")
    j = j.assign(revenue=j["l_extendedprice"] * (1 - j["l_discount"]))
    r = (
        j.groupby(["l_orderkey", "o_orderdate", "o_shippriority"])
        .agg(revenue=("revenue", "sum"))
        .reset_index()
    )
    return r.sort_values(["revenue", "l_orderkey"], ascending=False).head(10)


_SQL03 = """
SELECT l_orderkey, o_orderdate, o_shippriority,
       sum(l_extendedprice * (1 - l_discount)) AS revenue
FROM customer JOIN orders ON c_custkey = o_custkey
JOIN lineitem ON o_orderkey = l_orderkey
WHERE c_mktsegment = 'BUILDING'
  AND o_orderdate < TIMESTAMP '1995-03-15' AND l_shipdate > TIMESTAMP '1995-03-15'
GROUP BY l_orderkey, o_orderdate, o_shippriority
ORDER BY revenue DESC, l_orderkey DESC
LIMIT 10
"""


def _q04(t):
    o, li = t["orders"], t["lineitem"]
    o = o[
        (o["o_orderdate"] >= DATE("1993-07-01"))
        & (o["o_orderdate"] < DATE("1993-10-01"))
    ]
    late = li[li["l_commitdate"] < li["l_receiptdate"]]
    keys = late[["l_orderkey"]].drop_duplicates()
    j = o.merge(keys, left_on="o_orderkey", right_on="l_orderkey")
    r = (
        j.groupby("o_orderpriority")
        .agg(order_count=("o_orderkey", "count"))
        .reset_index()
    )
    return r.sort_values("o_orderpriority")


_SQL04 = """
SELECT o_orderpriority, count(*) AS order_count
FROM orders
WHERE o_orderdate >= TIMESTAMP '1993-07-01' AND o_orderdate < TIMESTAMP '1993-10-01'
  AND o_orderkey IN (SELECT l_orderkey FROM lineitem
                     WHERE l_commitdate < l_receiptdate)
GROUP BY o_orderpriority ORDER BY o_orderpriority
"""


def _q05(t):
    c, o, li, s, n, r = (
        t["customer"], t["orders"], t["lineitem"], t["supplier"], t["nation"],
        t["region"],
    )
    o = o[
        (o["o_orderdate"] >= DATE("1994-01-01"))
        & (o["o_orderdate"] < DATE("1995-01-01"))
    ]
    n = n.merge(r, left_on="n_regionkey", right_on="r_regionkey")
    n = n[n["r_name"] == "ASIA"]
    j = c.merge(o, left_on="c_custkey", right_on="o_custkey")
    j = j.merge(li, left_on="o_orderkey", right_on="l_orderkey")
    j = j.merge(s, left_on="l_suppkey", right_on="s_suppkey")
    j = j[j["c_nationkey"] == j["s_nationkey"]]
    j = j.merge(n, left_on="s_nationkey", right_on="n_nationkey")
    j = j.assign(revenue=j["l_extendedprice"] * (1 - j["l_discount"]))
    out = j.groupby("n_name").agg(revenue=("revenue", "sum")).reset_index()
    return out.sort_values(["revenue", "n_name"], ascending=False)


_SQL05 = """
SELECT n_name, sum(l_extendedprice * (1 - l_discount)) AS revenue
FROM customer JOIN orders ON c_custkey = o_custkey
JOIN lineitem ON o_orderkey = l_orderkey
JOIN supplier ON l_suppkey = s_suppkey AND c_nationkey = s_nationkey
JOIN nation ON s_nationkey = n_nationkey
JOIN region ON n_regionkey = r_regionkey
WHERE r_name = 'ASIA' AND o_orderdate >= TIMESTAMP '1994-01-01'
  AND o_orderdate < TIMESTAMP '1995-01-01'
GROUP BY n_name ORDER BY revenue DESC, n_name DESC
"""


def _q06(t):
    li = t["lineitem"]
    f = li[
        (li["l_shipdate"] >= DATE("1994-01-01"))
        & (li["l_shipdate"] < DATE("1995-01-01"))
        & (li["l_discount"] >= 0.05)
        & (li["l_discount"] <= 0.07)
        & (li["l_quantity"] < 24)
    ]
    revenue = (f["l_extendedprice"] * f["l_discount"]).sum()
    return pd.DataFrame({"revenue": [float(revenue)]})


_SQL06 = """
SELECT sum(l_extendedprice * l_discount) AS revenue
FROM lineitem
WHERE l_shipdate >= TIMESTAMP '1994-01-01' AND l_shipdate < TIMESTAMP '1995-01-01'
  AND l_discount BETWEEN 0.05 AND 0.07 AND l_quantity < 24
"""


def _q07(t):
    li, s, o, c, n = (
        t["lineitem"], t["supplier"], t["orders"], t["customer"], t["nation"],
    )
    li = li[
        (li["l_shipdate"] >= DATE("1995-01-01"))
        & (li["l_shipdate"] <= DATE("1996-12-31"))
    ]
    n1 = n.rename(columns={"n_nationkey": "n1_key", "n_name": "supp_nation"})[
        ["n1_key", "supp_nation"]
    ]
    n2 = n.rename(columns={"n_nationkey": "n2_key", "n_name": "cust_nation"})[
        ["n2_key", "cust_nation"]
    ]
    j = li.merge(s, left_on="l_suppkey", right_on="s_suppkey")
    j = j.merge(o, left_on="l_orderkey", right_on="o_orderkey")
    j = j.merge(c, left_on="o_custkey", right_on="c_custkey")
    j = j.merge(n1, left_on="s_nationkey", right_on="n1_key")
    j = j.merge(n2, left_on="c_nationkey", right_on="n2_key")
    fr_de = (j["supp_nation"] == "FRANCE") & (j["cust_nation"] == "GERMANY")
    de_fr = (j["supp_nation"] == "GERMANY") & (j["cust_nation"] == "FRANCE")
    j = j[fr_de | de_fr]
    j = j.assign(
        volume=j["l_extendedprice"] * (1 - j["l_discount"]),
        l_year=j["l_shipdate"].dt.year,
    )
    r = (
        j.groupby(["supp_nation", "cust_nation", "l_year"])
        .agg(revenue=("volume", "sum"))
        .reset_index()
    )
    return r.sort_values(["supp_nation", "cust_nation", "l_year"])


_SQL07 = """
SELECT n1.n_name AS supp_nation, n2.n_name AS cust_nation,
       year(l_shipdate) AS l_year,
       sum(l_extendedprice * (1 - l_discount)) AS revenue
FROM lineitem JOIN supplier ON l_suppkey = s_suppkey
JOIN orders ON l_orderkey = o_orderkey
JOIN customer ON o_custkey = c_custkey
JOIN nation n1 ON s_nationkey = n1.n_nationkey
JOIN nation n2 ON c_nationkey = n2.n_nationkey
WHERE l_shipdate BETWEEN TIMESTAMP '1995-01-01' AND TIMESTAMP '1996-12-31'
  AND ((n1.n_name = 'FRANCE' AND n2.n_name = 'GERMANY')
    OR (n1.n_name = 'GERMANY' AND n2.n_name = 'FRANCE'))
GROUP BY supp_nation, cust_nation, l_year
ORDER BY supp_nation, cust_nation, l_year
"""


def _q08(t):
    p, li, s, o, c, n, r = (
        t["part"], t["lineitem"], t["supplier"], t["orders"], t["customer"],
        t["nation"], t["region"],
    )
    p = p[p["p_type"] == "ECONOMY"]
    o = o[
        (o["o_orderdate"] >= DATE("1995-01-01"))
        & (o["o_orderdate"] <= DATE("1996-12-31"))
    ]
    n1 = n.merge(r, left_on="n_regionkey", right_on="r_regionkey")
    n1 = n1[n1["r_name"] == "AMERICA"][["n_nationkey"]]
    n2 = n.rename(columns={"n_nationkey": "n2_key", "n_name": "supp_nation"})[
        ["n2_key", "supp_nation"]
    ]
    j = li.merge(p, left_on="l_partkey", right_on="p_partkey")
    j = j.merge(o, left_on="l_orderkey", right_on="o_orderkey")
    j = j.merge(c, left_on="o_custkey", right_on="c_custkey")
    j = j.merge(n1, left_on="c_nationkey", right_on="n_nationkey")
    j = j.merge(s, left_on="l_suppkey", right_on="s_suppkey")
    j = j.merge(n2, left_on="s_nationkey", right_on="n2_key")
    j = j.assign(
        volume=j["l_extendedprice"] * (1 - j["l_discount"]),
        o_year=j["o_orderdate"].dt.year,
    )
    j = j.assign(brazil=j["volume"] * (j["supp_nation"] == "BRAZIL"))
    g = (
        j.groupby("o_year")
        .agg(brazil=("brazil", "sum"), total=("volume", "sum"))
        .reset_index()
    )
    g = g.assign(mkt_share=g["brazil"] / g["total"])
    return g[["o_year", "mkt_share"]].sort_values("o_year")


_SQL08 = """
SELECT year(o_orderdate) AS o_year,
       sum(CASE WHEN n2.n_name = 'BRAZIL'
           THEN l_extendedprice * (1 - l_discount) ELSE 0 END)
       / sum(l_extendedprice * (1 - l_discount)) AS mkt_share
FROM lineitem JOIN part ON l_partkey = p_partkey
JOIN orders ON l_orderkey = o_orderkey
JOIN customer ON o_custkey = c_custkey
JOIN nation n1 ON c_nationkey = n1.n_nationkey
JOIN region ON n1.n_regionkey = r_regionkey
JOIN supplier ON l_suppkey = s_suppkey
JOIN nation n2 ON s_nationkey = n2.n_nationkey
WHERE r_name = 'AMERICA' AND p_type = 'ECONOMY'
  AND o_orderdate BETWEEN TIMESTAMP '1995-01-01' AND TIMESTAMP '1996-12-31'
GROUP BY o_year ORDER BY o_year
"""


def _q09(t):
    p, li, s, ps, o, n = (
        t["part"], t["lineitem"], t["supplier"], t["partsupp"], t["orders"],
        t["nation"],
    )
    p = p[p["p_color"] == "green"][["p_partkey"]]
    j = li.merge(p, left_on="l_partkey", right_on="p_partkey")
    j = j.merge(s, left_on="l_suppkey", right_on="s_suppkey")
    j = j.merge(
        ps,
        left_on=["l_partkey", "l_suppkey"],
        right_on=["ps_partkey", "ps_suppkey"],
    )
    j = j.merge(o, left_on="l_orderkey", right_on="o_orderkey")
    j = j.merge(n, left_on="s_nationkey", right_on="n_nationkey")
    j = j.assign(
        amount=j["l_extendedprice"] * (1 - j["l_discount"])
        - j["ps_supplycost"] * j["l_quantity"],
        o_year=j["o_orderdate"].dt.year,
    )
    r = (
        j.groupby(["n_name", "o_year"])
        .agg(sum_profit=("amount", "sum"))
        .reset_index()
    )
    return r.sort_values(["n_name", "o_year"], ascending=[True, False])


_SQL09 = """
SELECT n_name, year(o_orderdate) AS o_year,
       sum(l_extendedprice * (1 - l_discount)
           - ps_supplycost * l_quantity) AS sum_profit
FROM lineitem JOIN part ON l_partkey = p_partkey
JOIN supplier ON l_suppkey = s_suppkey
JOIN partsupp ON l_partkey = ps_partkey AND l_suppkey = ps_suppkey
JOIN orders ON l_orderkey = o_orderkey
JOIN nation ON s_nationkey = n_nationkey
WHERE p_color = 'green'
GROUP BY n_name, o_year ORDER BY n_name, o_year DESC
"""


def _q10(t):
    c, o, li, n = t["customer"], t["orders"], t["lineitem"], t["nation"]
    o = o[
        (o["o_orderdate"] >= DATE("1993-10-01"))
        & (o["o_orderdate"] < DATE("1994-01-01"))
    ]
    li = li[li["l_returnflag"] == "R"]
    j = c.merge(o, left_on="c_custkey", right_on="o_custkey")
    j = j.merge(li, left_on="o_orderkey", right_on="l_orderkey")
    j = j.merge(n, left_on="c_nationkey", right_on="n_nationkey")
    j = j.assign(revenue=j["l_extendedprice"] * (1 - j["l_discount"]))
    r = (
        j.groupby(["c_custkey", "c_acctbal", "n_name"])
        .agg(revenue=("revenue", "sum"))
        .reset_index()
    )
    return r.sort_values(["revenue", "c_custkey"], ascending=False).head(20)


_SQL10 = """
SELECT c_custkey, c_acctbal, n_name,
       sum(l_extendedprice * (1 - l_discount)) AS revenue
FROM customer JOIN orders ON c_custkey = o_custkey
JOIN lineitem ON o_orderkey = l_orderkey
JOIN nation ON c_nationkey = n_nationkey
WHERE o_orderdate >= TIMESTAMP '1993-10-01' AND o_orderdate < TIMESTAMP '1994-01-01'
  AND l_returnflag = 'R'
GROUP BY c_custkey, c_acctbal, n_name
ORDER BY revenue DESC, c_custkey DESC LIMIT 20
"""


def _q11(t):
    ps, s, n = t["partsupp"], t["supplier"], t["nation"]
    s = s.merge(n, left_on="s_nationkey", right_on="n_nationkey")
    s = s[s["n_name"] == "GERMANY"][["s_suppkey"]]
    j = ps.merge(s, left_on="ps_suppkey", right_on="s_suppkey")
    j = j.assign(value=j["ps_supplycost"] * j["ps_availqty"])
    total = j["value"].sum()
    g = j.groupby("ps_partkey").agg(value=("value", "sum")).reset_index()
    g = g[g["value"] > float(total) * 0.0001]
    return g.sort_values(["value", "ps_partkey"], ascending=False)


_SQL11 = """
WITH j AS (
  SELECT ps_partkey, ps_supplycost * ps_availqty AS value
  FROM partsupp JOIN supplier ON ps_suppkey = s_suppkey
  JOIN nation ON s_nationkey = n_nationkey
  WHERE n_name = 'GERMANY'
)
SELECT ps_partkey, sum(value) AS value FROM j
GROUP BY ps_partkey
HAVING sum(value) > (SELECT sum(value) * 0.0001 FROM j)
ORDER BY value DESC, ps_partkey DESC
"""


def _q12(t):
    li, o = t["lineitem"], t["orders"]
    li = li[
        (li["l_shipmode"].isin(["MAIL", "SHIP"]))
        & (li["l_commitdate"] < li["l_receiptdate"])
        & (li["l_shipdate"] < li["l_commitdate"])
        & (li["l_receiptdate"] >= DATE("1994-01-01"))
        & (li["l_receiptdate"] < DATE("1995-01-01"))
    ]
    j = li.merge(o, left_on="l_orderkey", right_on="o_orderkey")
    high = j["o_orderpriority"].isin(["1-URGENT", "2-HIGH"])
    j = j.assign(
        high_line=high.astype("int64"), low_line=(~high).astype("int64")
    )
    r = (
        j.groupby("l_shipmode")
        .agg(high_line_count=("high_line", "sum"), low_line_count=("low_line", "sum"))
        .reset_index()
    )
    return r.sort_values("l_shipmode")


_SQL12 = """
SELECT l_shipmode,
       sum(CASE WHEN o_orderpriority IN ('1-URGENT','2-HIGH')
           THEN 1 ELSE 0 END) AS high_line_count,
       sum(CASE WHEN o_orderpriority IN ('1-URGENT','2-HIGH')
           THEN 0 ELSE 1 END) AS low_line_count
FROM lineitem JOIN orders ON l_orderkey = o_orderkey
WHERE l_shipmode IN ('MAIL','SHIP') AND l_commitdate < l_receiptdate
  AND l_shipdate < l_commitdate
  AND l_receiptdate >= TIMESTAMP '1994-01-01' AND l_receiptdate < TIMESTAMP '1995-01-01'
GROUP BY l_shipmode ORDER BY l_shipmode
"""


def _q13(t):
    c, o = t["customer"], t["orders"]
    o = o[o["o_special"] == 0][["o_orderkey", "o_custkey"]]
    j = c.merge(o, left_on="c_custkey", right_on="o_custkey", how="left")
    per_cust = (
        j.groupby("c_custkey").agg(c_count=("o_orderkey", "count")).reset_index()
    )
    r = (
        per_cust.groupby("c_count")
        .agg(custdist=("c_custkey", "count"))
        .reset_index()
    )
    return r.sort_values(["custdist", "c_count"], ascending=False)


_SQL13 = """
SELECT c_count, count(*) AS custdist FROM (
  SELECT c_custkey, count(o_orderkey) AS c_count
  FROM customer LEFT JOIN orders
    ON c_custkey = o_custkey AND o_special = 0
  GROUP BY c_custkey
) GROUP BY c_count ORDER BY custdist DESC, c_count DESC
"""


def _q14(t):
    li, p = t["lineitem"], t["part"]
    li = li[
        (li["l_shipdate"] >= DATE("1995-09-01"))
        & (li["l_shipdate"] < DATE("1995-10-01"))
    ]
    j = li.merge(p, left_on="l_partkey", right_on="p_partkey")
    j = j.assign(revenue=j["l_extendedprice"] * (1 - j["l_discount"]))
    j = j.assign(promo=j["revenue"] * (j["p_type"] == "PROMO"))
    promo = float(j["promo"].sum())
    total = float(j["revenue"].sum())
    return pd.DataFrame({"promo_revenue": [100.0 * promo / total]})


_SQL14 = """
SELECT 100.0 * sum(CASE WHEN p_type = 'PROMO'
       THEN l_extendedprice * (1 - l_discount) ELSE 0 END)
       / sum(l_extendedprice * (1 - l_discount)) AS promo_revenue
FROM lineitem JOIN part ON l_partkey = p_partkey
WHERE l_shipdate >= TIMESTAMP '1995-09-01' AND l_shipdate < TIMESTAMP '1995-10-01'
"""


def _q15(t):
    li, s = t["lineitem"], t["supplier"]
    li = li[
        (li["l_shipdate"] >= DATE("1996-01-01"))
        & (li["l_shipdate"] < DATE("1996-04-01"))
    ]
    li = li.assign(revenue=li["l_extendedprice"] * (1 - li["l_discount"]))
    rev = (
        li.groupby("l_suppkey").agg(total_revenue=("revenue", "sum")).reset_index()
    )
    mx = rev["total_revenue"].max()
    top = rev[rev["total_revenue"] >= float(mx) - 1e-6]
    j = top.merge(s, left_on="l_suppkey", right_on="s_suppkey")
    return j[["s_suppkey", "total_revenue"]].sort_values("s_suppkey")


_SQL15 = """
WITH rev AS (
  SELECT l_suppkey, sum(l_extendedprice * (1 - l_discount)) AS total_revenue
  FROM lineitem
  WHERE l_shipdate >= TIMESTAMP '1996-01-01' AND l_shipdate < TIMESTAMP '1996-04-01'
  GROUP BY l_suppkey
)
SELECT s_suppkey, total_revenue
FROM rev JOIN supplier ON l_suppkey = s_suppkey
WHERE total_revenue >= (SELECT max(total_revenue) FROM rev) - 1e-6
ORDER BY s_suppkey
"""


def _q16(t):
    ps, p, s = t["partsupp"], t["part"], t["supplier"]
    p = p[
        (p["p_brand"] != "Brand#45")
        & (p["p_type"] != "MEDIUM")
        & (p["p_size"].isin([49, 14, 23, 45, 19, 3, 36, 9]))
    ]
    bad = s[s["s_complaint"] == 1][["s_suppkey"]]
    j = ps.merge(p, left_on="ps_partkey", right_on="p_partkey")
    j = j.merge(
        bad.rename(columns={"s_suppkey": "bad_key"}),
        left_on="ps_suppkey", right_on="bad_key", how="left",
    )
    j = j[j["bad_key"].isna()]
    r = (
        j.groupby(["p_brand", "p_type", "p_size"])
        .agg(supplier_cnt=("ps_suppkey", "nunique"))
        .reset_index()
    )
    return r.sort_values(
        ["supplier_cnt", "p_brand", "p_type", "p_size"],
        ascending=[False, True, True, True],
    )


_SQL16 = """
SELECT p_brand, p_type, p_size, count(DISTINCT ps_suppkey) AS supplier_cnt
FROM partsupp JOIN part ON ps_partkey = p_partkey
WHERE p_brand <> 'Brand#45' AND p_type <> 'MEDIUM'
  AND p_size IN (49,14,23,45,19,3,36,9)
  AND ps_suppkey NOT IN (SELECT s_suppkey FROM supplier WHERE s_complaint = 1)
GROUP BY p_brand, p_type, p_size
ORDER BY supplier_cnt DESC, p_brand, p_type, p_size
"""


def _q17(t):
    li, p = t["lineitem"], t["part"]
    p = p[(p["p_brand"] == "Brand#23") & (p["p_container"] == "MED BOX")][
        ["p_partkey"]
    ]
    j = li.merge(p, left_on="l_partkey", right_on="p_partkey")
    avg = j.groupby("l_partkey").agg(avg_qty=("l_quantity", "mean")).reset_index()
    j2 = j.merge(avg, on="l_partkey")
    j2 = j2[j2["l_quantity"] < 0.2 * j2["avg_qty"]]
    total = float(j2["l_extendedprice"].sum())
    return pd.DataFrame({"avg_yearly": [total / 7.0]})


_SQL17 = """
WITH j AS (
  SELECT l_partkey, l_quantity, l_extendedprice
  FROM lineitem JOIN part ON l_partkey = p_partkey
  WHERE p_brand = 'Brand#23' AND p_container = 'MED BOX'
), a AS (
  SELECT l_partkey AS pk, avg(l_quantity) AS avg_qty FROM j GROUP BY l_partkey
)
SELECT sum(l_extendedprice) / 7.0 AS avg_yearly
FROM j JOIN a ON j.l_partkey = a.pk
WHERE l_quantity < 0.2 * avg_qty
"""


def _q18(t):
    c, o, li = t["customer"], t["orders"], t["lineitem"]
    big = (
        li.groupby("l_orderkey").agg(sum_qty=("l_quantity", "sum")).reset_index()
    )
    big = big[big["sum_qty"] > 300]
    j = o.merge(big, left_on="o_orderkey", right_on="l_orderkey")
    j = j.merge(c, left_on="o_custkey", right_on="c_custkey")
    out = j[["c_custkey", "o_orderkey", "o_orderdate", "o_totalprice", "sum_qty"]]
    return out.sort_values(
        ["o_totalprice", "o_orderkey"], ascending=[False, True]
    ).head(100)


_SQL18 = """
WITH big AS (
  SELECT l_orderkey, sum(l_quantity) AS sum_qty FROM lineitem
  GROUP BY l_orderkey HAVING sum(l_quantity) > 300
)
SELECT c_custkey, o_orderkey, o_orderdate, o_totalprice, sum_qty
FROM orders JOIN big ON o_orderkey = big.l_orderkey
JOIN customer ON o_custkey = c_custkey
ORDER BY o_totalprice DESC, o_orderkey LIMIT 100
"""


def _q19(t):
    li, p = t["lineitem"], t["part"]
    li = li[li["l_shipinstruct"] == "DELIVER IN PERSON"]
    j = li.merge(p, left_on="l_partkey", right_on="p_partkey")
    c1 = (j["p_brand"] == "Brand#12") & (j["p_container"] == "SM CASE") & (
        j["l_quantity"] >= 1
    ) & (j["l_quantity"] <= 11)
    c2 = (j["p_brand"] == "Brand#23") & (j["p_container"] == "MED BOX") & (
        j["l_quantity"] >= 10
    ) & (j["l_quantity"] <= 20)
    c3 = (j["p_brand"] == "Brand#34") & (j["p_container"] == "LG BOX") & (
        j["l_quantity"] >= 20
    ) & (j["l_quantity"] <= 30)
    j = j[c1 | c2 | c3]
    revenue = (j["l_extendedprice"] * (1 - j["l_discount"])).sum()
    return pd.DataFrame({"revenue": [float(revenue)]})


_SQL19 = """
SELECT sum(l_extendedprice * (1 - l_discount)) AS revenue
FROM lineitem JOIN part ON l_partkey = p_partkey
WHERE l_shipinstruct = 'DELIVER IN PERSON' AND (
  (p_brand = 'Brand#12' AND p_container = 'SM CASE' AND l_quantity BETWEEN 1 AND 11)
  OR (p_brand = 'Brand#23' AND p_container = 'MED BOX' AND l_quantity BETWEEN 10 AND 20)
  OR (p_brand = 'Brand#34' AND p_container = 'LG BOX' AND l_quantity BETWEEN 20 AND 30))
"""


def _q20(t):
    li, ps, p, s, n = (
        t["lineitem"], t["partsupp"], t["part"], t["supplier"], t["nation"],
    )
    li = li[
        (li["l_shipdate"] >= DATE("1994-01-01"))
        & (li["l_shipdate"] < DATE("1995-01-01"))
    ]
    shipped = (
        li.groupby(["l_partkey", "l_suppkey"])
        .agg(qty=("l_quantity", "sum"))
        .reset_index()
    )
    p = p[p["p_color"] == "green"][["p_partkey"]]
    j = ps.merge(p, left_on="ps_partkey", right_on="p_partkey")
    j = j.merge(
        shipped,
        left_on=["ps_partkey", "ps_suppkey"],
        right_on=["l_partkey", "l_suppkey"],
    )
    j = j[j["ps_availqty"] > 0.5 * j["qty"]]
    keys = j[["ps_suppkey"]].drop_duplicates()
    sn = s.merge(n, left_on="s_nationkey", right_on="n_nationkey")
    sn = sn[sn["n_name"] == "CANADA"]
    out = sn.merge(keys, left_on="s_suppkey", right_on="ps_suppkey")
    return out[["s_suppkey"]].sort_values("s_suppkey")


_SQL20 = """
SELECT s_suppkey FROM supplier JOIN nation ON s_nationkey = n_nationkey
WHERE n_name = 'CANADA' AND s_suppkey IN (
  SELECT ps_suppkey FROM partsupp
  JOIN part ON ps_partkey = p_partkey
  JOIN (SELECT l_partkey, l_suppkey, sum(l_quantity) AS qty
        FROM lineitem
        WHERE l_shipdate >= TIMESTAMP '1994-01-01' AND l_shipdate < TIMESTAMP '1995-01-01'
        GROUP BY l_partkey, l_suppkey) shipped
    ON ps_partkey = l_partkey AND ps_suppkey = l_suppkey
  WHERE p_color = 'green' AND ps_availqty > 0.5 * qty)
ORDER BY s_suppkey
"""


def _q21(t):
    li, o, s, n = t["lineitem"], t["orders"], t["supplier"], t["nation"]
    o = o[o["o_orderstatus"] == "F"][["o_orderkey"]]
    li_f = li.merge(o, left_on="l_orderkey", right_on="o_orderkey")
    n_supp = (
        li_f.groupby("l_orderkey").agg(n_supp=("l_suppkey", "nunique")).reset_index()
    )
    late = li_f[li_f["l_receiptdate"] > li_f["l_commitdate"]]
    n_late = (
        late.groupby("l_orderkey")
        .agg(n_late=("l_suppkey", "nunique"))
        .reset_index()
        .rename(columns={"l_orderkey": "lk"})
    )
    j = late.merge(n_supp, on="l_orderkey")
    j = j.merge(n_late, left_on="l_orderkey", right_on="lk")
    j = j[(j["n_supp"] > 1) & (j["n_late"] == 1)]
    sn = s.merge(n, left_on="s_nationkey", right_on="n_nationkey")
    sn = sn[sn["n_name"] == "SAUDI ARABIA"][["s_suppkey"]]
    j = j.merge(sn, left_on="l_suppkey", right_on="s_suppkey")
    r = j.groupby("s_suppkey").agg(numwait=("l_orderkey", "count")).reset_index()
    return r.sort_values(["numwait", "s_suppkey"], ascending=[False, True]).head(100)


_SQL21 = """
WITH lif AS (
  SELECT l.* FROM lineitem l JOIN orders ON l_orderkey = o_orderkey
  WHERE o_orderstatus = 'F'
), ns AS (
  SELECT l_orderkey, count(DISTINCT l_suppkey) AS n_supp FROM lif GROUP BY l_orderkey
), late AS (
  SELECT * FROM lif WHERE l_receiptdate > l_commitdate
), nl AS (
  SELECT l_orderkey, count(DISTINCT l_suppkey) AS n_late FROM late GROUP BY l_orderkey
)
SELECT s_suppkey, count(*) AS numwait
FROM late JOIN ns ON late.l_orderkey = ns.l_orderkey
JOIN nl ON late.l_orderkey = nl.l_orderkey
JOIN supplier ON l_suppkey = s_suppkey
JOIN nation ON s_nationkey = n_nationkey
WHERE n_supp > 1 AND n_late = 1 AND n_name = 'SAUDI ARABIA'
GROUP BY s_suppkey ORDER BY numwait DESC, s_suppkey LIMIT 100
"""


def _q22(t):
    c, o = t["customer"], t["orders"]
    cc = [13, 31, 23, 29, 30, 18, 17]
    c = c[c["c_phone_cc"].isin(cc)]
    pos = c[c["c_acctbal"] > 0.0]
    avg_bal = float(pos["c_acctbal"].mean())
    rich = c[c["c_acctbal"] > avg_bal]
    keys = o[["o_custkey"]].drop_duplicates()
    j = rich.merge(
        keys.rename(columns={"o_custkey": "ok"}),
        left_on="c_custkey", right_on="ok", how="left",
    )
    j = j[j["ok"].isna()]
    r = (
        j.groupby("c_phone_cc")
        .agg(numcust=("c_custkey", "count"), totacctbal=("c_acctbal", "sum"))
        .reset_index()
    )
    return r.sort_values("c_phone_cc")


_SQL22 = """
WITH sel AS (
  SELECT * FROM customer WHERE c_phone_cc IN (13,31,23,29,30,18,17)
)
SELECT c_phone_cc, count(*) AS numcust, sum(c_acctbal) AS totacctbal
FROM sel
WHERE c_acctbal > (SELECT avg(c_acctbal) FROM sel WHERE c_acctbal > 0.0)
  AND c_custkey NOT IN (SELECT o_custkey FROM orders)
GROUP BY c_phone_cc ORDER BY c_phone_cc
"""


QUERIES: dict[str, Query] = {
    "q01": Query("q01", _q01, _SQL01, ["lineitem"]),
    "q02": Query("q02", _q02, _SQL02,
                 ["part", "partsupp", "supplier", "nation", "region"]),
    "q03": Query("q03", _q03, _SQL03, ["customer", "orders", "lineitem"]),
    "q04": Query("q04", _q04, _SQL04, ["orders", "lineitem"]),
    "q05": Query("q05", _q05, _SQL05,
                 ["customer", "orders", "lineitem", "supplier", "nation", "region"]),
    "q06": Query("q06", _q06, _SQL06, ["lineitem"]),
    "q07": Query("q07", _q07, _SQL07,
                 ["lineitem", "supplier", "orders", "customer", "nation"]),
    "q08": Query("q08", _q08, _SQL08,
                 ["part", "lineitem", "supplier", "orders", "customer", "nation",
                  "region"]),
    "q09": Query("q09", _q09, _SQL09,
                 ["part", "lineitem", "supplier", "partsupp", "orders", "nation"]),
    "q10": Query("q10", _q10, _SQL10, ["customer", "orders", "lineitem", "nation"]),
    "q11": Query("q11", _q11, _SQL11, ["partsupp", "supplier", "nation"]),
    "q12": Query("q12", _q12, _SQL12, ["lineitem", "orders"]),
    "q13": Query("q13", _q13, _SQL13, ["customer", "orders"]),
    "q14": Query("q14", _q14, _SQL14, ["lineitem", "part"]),
    "q15": Query("q15", _q15, _SQL15, ["lineitem", "supplier"]),
    "q16": Query("q16", _q16, _SQL16, ["partsupp", "part", "supplier"]),
    "q17": Query("q17", _q17, _SQL17, ["lineitem", "part"]),
    "q18": Query("q18", _q18, _SQL18, ["customer", "orders", "lineitem"]),
    "q19": Query("q19", _q19, _SQL19, ["lineitem", "part"]),
    "q20": Query("q20", _q20, _SQL20,
                 ["lineitem", "partsupp", "part", "supplier", "nation"]),
    "q21": Query("q21", _q21, _SQL21, ["lineitem", "orders", "supplier", "nation"]),
    "q22": Query("q22", _q22, _SQL22, ["customer", "orders"]),
}
