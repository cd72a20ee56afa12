"""TPC-H-lite / TPC-DS-lite queries as DataFrame builders + oracle SQL.

Each entry provides a Spark DataFrame pipeline over the ``repro.synth_data``
tables and the equivalent SQL for the DuckDB oracle, with output columns
aliased identically on both sides — so every configuration experiment can
assert result equality, not just "it ran".
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession

from repro import synth_data


@dataclass(frozen=True)
class LiteQuery:
    """One executable validation query."""

    name: str
    tables: tuple[str, ...]                       # synth_data generator names
    build: Callable[..., DataFrame]               # (**{table: DataFrame}) -> DataFrame
    sql: str                                      # DuckDB equivalent


def _q1(lineitem: DataFrame) -> DataFrame:
    return (
        lineitem.where(F.col("l_shipdate") <= F.lit("1998-09-01"))
        .groupBy("l_returnflag", "l_linestatus")
        .agg(
            F.sum("l_quantity").alias("sum_qty"),
            F.sum("l_extendedprice").alias("sum_base_price"),
            F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))).alias("sum_disc_price"),
            F.count(F.lit(1)).alias("count_order"),
        )
        .orderBy("l_returnflag", "l_linestatus")
    )


_Q1_SQL = """
SELECT l_returnflag, l_linestatus,
       sum(l_quantity) AS sum_qty,
       sum(l_extendedprice) AS sum_base_price,
       sum(l_extendedprice * (1 - l_discount)) AS sum_disc_price,
       count(*) AS count_order
FROM lineitem
WHERE l_shipdate <= '1998-09-01'
GROUP BY l_returnflag, l_linestatus
ORDER BY l_returnflag, l_linestatus
"""


def _q3(customer: DataFrame, orders: DataFrame, lineitem: DataFrame) -> DataFrame:
    return (
        customer.where(F.col("c_mktsegment") == "BUILDING")
        .join(orders, F.col("c_custkey") == F.col("o_custkey"))
        .where(F.col("o_orderdate") < F.lit("1995-03-15"))
        .join(lineitem.where(F.col("l_shipdate") > F.lit("1995-03-15")),
              F.col("l_orderkey") == F.col("o_orderkey"))
        .groupBy("o_orderkey", "o_orderdate")
        .agg(F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))).alias("revenue"))
        .orderBy(F.desc("revenue"), "o_orderdate", "o_orderkey")
        .limit(10)
    )


_Q3_SQL = """
SELECT o_orderkey, o_orderdate,
       sum(l_extendedprice * (1 - l_discount)) AS revenue
FROM customer, orders, lineitem
WHERE c_mktsegment = 'BUILDING'
  AND c_custkey = o_custkey
  AND o_orderdate < '1995-03-15'
  AND l_orderkey = o_orderkey
  AND l_shipdate > '1995-03-15'
GROUP BY o_orderkey, o_orderdate
ORDER BY revenue DESC, o_orderdate, o_orderkey
LIMIT 10
"""


def _q6(lineitem: DataFrame) -> DataFrame:
    return (
        lineitem.where(
            (F.col("l_shipdate") >= F.lit("1994-01-01"))
            & (F.col("l_shipdate") < F.lit("1995-01-01"))
            & (F.col("l_discount").between(0.05, 0.07))
            & (F.col("l_quantity") < 24)
        )
        .agg(F.sum(F.col("l_extendedprice") * F.col("l_discount")).alias("revenue"))
    )


_Q6_SQL = """
SELECT sum(l_extendedprice * l_discount) AS revenue
FROM lineitem
WHERE l_shipdate >= '1994-01-01' AND l_shipdate < '1995-01-01'
  AND l_discount BETWEEN 0.05 AND 0.07 AND l_quantity < 24
"""


def _q5ish(customer: DataFrame, orders: DataFrame, lineitem: DataFrame,
           supplier: DataFrame, nation: DataFrame) -> DataFrame:
    """A 4-join chain through the TPC-H schema (Q5 without region)."""
    return (
        customer.join(orders, F.col("c_custkey") == F.col("o_custkey"))
        .where((F.col("o_orderdate") >= F.lit("1994-01-01"))
               & (F.col("o_orderdate") < F.lit("1995-01-01")))
        .join(lineitem, F.col("l_orderkey") == F.col("o_orderkey"))
        .join(supplier, F.col("l_partkey") % 100 + 1 == F.col("s_suppkey") % 100 + 1,
              "inner")
        .join(nation, F.col("s_nationkey") == F.col("n_nationkey"))
        .where(F.col("c_nationkey") == F.col("s_nationkey"))
        .groupBy("n_name")
        .agg(F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))).alias("revenue"))
        .orderBy(F.desc("revenue"), "n_name")
    )


_Q5ISH_SQL = """
SELECT n_name, sum(l_extendedprice * (1 - l_discount)) AS revenue
FROM customer, orders, lineitem, supplier, nation
WHERE c_custkey = o_custkey
  AND o_orderdate >= '1994-01-01' AND o_orderdate < '1995-01-01'
  AND l_orderkey = o_orderkey
  AND (l_partkey % 100 + 1) = (s_suppkey % 100 + 1)
  AND s_nationkey = n_nationkey
  AND c_nationkey = s_nationkey
GROUP BY n_name
ORDER BY revenue DESC, n_name
"""


def _q12(orders: DataFrame, lineitem: DataFrame) -> DataFrame:
    return (
        orders.join(lineitem.where(F.col("l_shipdate") >= F.lit("1994-01-01")),
                    F.col("l_orderkey") == F.col("o_orderkey"))
        .groupBy("o_orderpriority")
        .agg(F.count(F.lit(1)).alias("order_count"),
             F.sum("l_extendedprice").alias("total_price"))
        .orderBy("o_orderpriority")
    )


_Q12_SQL = """
SELECT o_orderpriority, count(*) AS order_count,
       sum(l_extendedprice) AS total_price
FROM orders, lineitem
WHERE l_orderkey = o_orderkey AND l_shipdate >= '1994-01-01'
GROUP BY o_orderpriority
ORDER BY o_orderpriority
"""


def _q14(lineitem: DataFrame, part: DataFrame) -> DataFrame:
    return (
        lineitem.where((F.col("l_shipdate") >= F.lit("1995-09-01"))
                       & (F.col("l_shipdate") < F.lit("1995-10-01")))
        .join(part, F.col("l_partkey") == F.col("p_partkey"))
        .groupBy("p_type")
        .agg(F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))).alias("revenue"))
        .orderBy("p_type")
    )


_Q14_SQL = """
SELECT p_type, sum(l_extendedprice * (1 - l_discount)) AS revenue
FROM lineitem, part
WHERE l_partkey = p_partkey
  AND l_shipdate >= '1995-09-01' AND l_shipdate < '1995-10-01'
GROUP BY p_type
ORDER BY p_type
"""


def _q18(customer: DataFrame, orders: DataFrame, lineitem: DataFrame) -> DataFrame:
    big = (lineitem.groupBy("l_orderkey")
           .agg(F.sum("l_quantity").alias("sum_qty"))
           .where(F.col("sum_qty") > 180))
    return (
        orders.join(big, F.col("o_orderkey") == F.col("l_orderkey"))
        .join(customer, F.col("c_custkey") == F.col("o_custkey"))
        .select("c_custkey", "o_orderkey", "o_orderdate", "o_totalprice", "sum_qty")
        .orderBy(F.desc("o_totalprice"), "o_orderkey")
        .limit(100)
    )


_Q18_SQL = """
SELECT c_custkey, o_orderkey, o_orderdate, o_totalprice, sum_qty
FROM orders,
     (SELECT l_orderkey, sum(l_quantity) AS sum_qty
      FROM lineitem GROUP BY l_orderkey HAVING sum(l_quantity) > 180) big,
     customer
WHERE o_orderkey = big.l_orderkey AND c_custkey = o_custkey
ORDER BY o_totalprice DESC, o_orderkey
LIMIT 100
"""


def _ds_q3(store_sales: DataFrame, date_dim: DataFrame, item: DataFrame) -> DataFrame:
    return (
        store_sales.join(date_dim, F.col("ss_sold_date_sk") == F.col("d_date_sk"))
        .where(F.col("d_moy") == 11)
        .join(item.where(F.col("i_manufact_id") == 128),
              F.col("ss_item_sk") == F.col("i_item_sk"))
        .groupBy("d_year", "i_brand_id")
        .agg(F.sum("ss_ext_sales_price").alias("sum_agg"))
        .orderBy("d_year", F.desc("sum_agg"), "i_brand_id")
    )


_DS_Q3_SQL = """
SELECT d_year, i_brand_id, sum(ss_ext_sales_price) AS sum_agg
FROM store_sales, date_dim, item
WHERE ss_sold_date_sk = d_date_sk AND d_moy = 11
  AND ss_item_sk = i_item_sk AND i_manufact_id = 128
GROUP BY d_year, i_brand_id
ORDER BY d_year, sum_agg DESC, i_brand_id
"""


LITE_QUERIES: dict[str, LiteQuery] = {
    q.name: q
    for q in [
        LiteQuery("q1", ("lineitem",), _q1, _Q1_SQL),
        LiteQuery("q3", ("customer", "orders", "lineitem"), _q3, _Q3_SQL),
        LiteQuery("q6", ("lineitem",), _q6, _Q6_SQL),
        LiteQuery("q5ish", ("customer", "orders", "lineitem", "supplier", "nation"),
                  _q5ish, _Q5ISH_SQL),
        LiteQuery("q12", ("orders", "lineitem"), _q12, _Q12_SQL),
        LiteQuery("q14", ("lineitem", "part"), _q14, _Q14_SQL),
        LiteQuery("q18", ("customer", "orders", "lineitem"), _q18, _Q18_SQL),
        LiteQuery("ds_q3", ("store_sales", "date_dim", "item"), _ds_q3, _DS_Q3_SQL),
    ]
}


def load_tables(spark: SparkSession, names: tuple[str, ...], *, sf: float = 0.01):
    """Materialize (and cache) the synth tables a query needs.

    Date columns are cast to strings for the DuckDB comparison (the Spark
    builders compare them lexicographically, which is equivalent for ISO
    dates).
    """
    out = {}
    for n in names:
        gen = getattr(synth_data, n)
        df = gen(spark, sf=sf) if n not in ("nation", "date_dim") else gen(spark)
        for c, t in df.dtypes:
            if t.startswith("timestamp") or t == "date":
                df = df.withColumn(c, F.date_format(c, "yyyy-MM-dd"))
        out[n] = df
    return out
