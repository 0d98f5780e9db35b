"""A Tydi-typed TPC-H pipeline on the Spark backend.

The paper motivates Tydi with "big data and SQL applications"
(Abstract): composite, variable-length data structures over streams.
This module exercises exactly that story end-to-end on the Spark
substrate: TPC-H-lite rows are declared as Tydi Groups (variable-length
text as nested ``Bits(8)`` Streams), queries Q6 and Q3 are built as
Streamlets with ``spark://`` linked implementations, composed
structurally in TIL, and executed by :class:`SparkBackend` with
interface contracts checked at every connection.

Tests verify the pipelines against DuckDB with
:func:`repro.oracle.assert_equivalent`; the benchmark compares the
composed pipeline against a hand-written single-expression Spark query
(composability overhead).
"""
from __future__ import annotations

from typing import Dict

import pyspark.sql.functions as F
from pyspark.sql import DataFrame, SparkSession

from ..core.project import Project
from ..til import parse_project
from .pipeline import SparkBackend
from .streamlets import BehaviorRegistry

TPCH_TIL = """\
namespace tpch {
// Variable-length text: a nested Stream of characters.
type chars = Stream(data: Bits(8), dimensionality: 1, synchronicity: Sync, complexity: 2);
type lineitem_row = Group(
    l_orderkey: Bits(64),
    l_partkey: Bits(64),
    l_linenumber: Bits(64),
    l_quantity: Bits(64),
    l_extendedprice: Bits(64),
    l_discount: Bits(64),
    l_tax: Bits(64),
    l_returnflag: chars,
    l_linestatus: chars,
    l_shipdate: Bits(64),
);
type orders_row = Group(
    o_orderkey: Bits(64),
    o_custkey: Bits(64),
    o_orderstatus: chars,
    o_totalprice: Bits(64),
    o_orderdate: Bits(64),
    o_orderpriority: chars,
);
type customer_row = Group(
    c_custkey: Bits(64),
    c_nationkey: Bits(64),
    c_acctbal: Bits(64),
    c_mktsegment: chars,
);
type lineitem = Stream(data: lineitem_row, complexity: 2);
type orders = Stream(data: orders_row, complexity: 2);
type customer = Stream(data: customer_row, complexity: 2);
type revenue = Stream(data: Group(revenue: Bits(64)), complexity: 2);
type q3_row = Group(
    l_orderkey: Bits(64),
    revenue: Bits(64),
    o_orderdate: Bits(64),
    o_orderpriority: chars,
);
type q3_result = Stream(data: q3_row, complexity: 2);

#Keep lineitem rows matching the Q6 predicate#
streamlet q6_filter = (input: in lineitem, output: out lineitem) { "spark://q6_filter" };
#Sum the discounted revenue#
streamlet q6_agg = (input: in lineitem, output: out revenue) { "spark://q6_agg" };
#TPC-H Q6 as a structural composition of two streamlets#
streamlet q6 = (lineitem: in lineitem, revenue: out revenue) {
    filter = q6_filter;
    agg = q6_agg;
    lineitem -- filter.input;
    filter.output -- agg.input;
    agg.output -- revenue;
};

streamlet q3_filter_customer = (input: in customer, output: out customer) { "spark://q3_filter_customer" };
streamlet q3_filter_orders = (input: in orders, output: out orders) { "spark://q3_filter_orders" };
streamlet q3_filter_lineitem = (input: in lineitem, output: out lineitem) { "spark://q3_filter_lineitem" };
streamlet q3_join_agg = (
    li: in lineitem,
    ord: in orders,
    cust: in customer,
    output: out q3_result,
) { "spark://q3_join_agg" };
#TPC-H Q3 as a structural composition: three filters feeding a join+aggregate#
streamlet q3 = (
    lineitem: in lineitem,
    orders: in orders,
    customer: in customer,
    result: out q3_result,
) {
    fl = q3_filter_lineitem;
    fo = q3_filter_orders;
    fc = q3_filter_customer;
    ja = q3_join_agg;
    lineitem -- fl.input;
    orders -- fo.input;
    customer -- fc.input;
    fl.output -- ja.li;
    fo.output -- ja.ord;
    fc.output -- ja.cust;
    ja.output -- result;
};
}
"""

#: The Q6 / Q3 predicate constants (TPC-H-style, adapted to the
#: synthetic generators' value ranges).
Q6_DATE_LO = "1994-01-01"
Q6_DATE_HI = "1995-01-01"
Q6_DISC_LO = 0.05
Q6_DISC_HI = 0.07
Q6_QTY = 24
Q3_SEGMENT = "BUILDING"
Q3_DATE = "1995-03-15"


def build_registry() -> BehaviorRegistry:
    """All Spark behaviours the TIL above links to."""
    r = BehaviorRegistry()

    @r.register("q6_filter")
    def q6_filter(ins: Dict[str, DataFrame]) -> Dict[str, DataFrame]:
        df = ins["input"]
        return {
            "output": df.where(
                (F.col("l_shipdate") >= F.lit(Q6_DATE_LO))
                & (F.col("l_shipdate") < F.lit(Q6_DATE_HI))
                & (F.col("l_discount") >= Q6_DISC_LO)
                & (F.col("l_discount") <= Q6_DISC_HI)
                & (F.col("l_quantity") < Q6_QTY)
            )
        }

    @r.register("q6_agg")
    def q6_agg(ins: Dict[str, DataFrame]) -> Dict[str, DataFrame]:
        df = ins["input"]
        return {
            "output": df.agg(
                F.sum(F.col("l_extendedprice") * F.col("l_discount")).alias("revenue")
            )
        }

    @r.register("q3_filter_customer")
    def q3_filter_customer(ins):
        return {"output": ins["input"].where(F.col("c_mktsegment") == Q3_SEGMENT)}

    @r.register("q3_filter_orders")
    def q3_filter_orders(ins):
        return {"output": ins["input"].where(F.col("o_orderdate") < F.lit(Q3_DATE))}

    @r.register("q3_filter_lineitem")
    def q3_filter_lineitem(ins):
        return {"output": ins["input"].where(F.col("l_shipdate") > F.lit(Q3_DATE))}

    @r.register("q3_join_agg")
    def q3_join_agg(ins):
        li, orders, cust = ins["li"], ins["ord"], ins["cust"]
        joined = (
            li.join(orders, li.l_orderkey == orders.o_orderkey)
            .join(cust, orders.o_custkey == cust.c_custkey)
        )
        out = (
            joined.groupBy("l_orderkey", "o_orderdate", "o_orderpriority")
            .agg(
                F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))).alias(
                    "revenue"
                )
            )
            .select("l_orderkey", "revenue", "o_orderdate", "o_orderpriority")
        )
        return {"output": out}

    return r


def build_backend() -> SparkBackend:
    project: Project = parse_project(TPCH_TIL)
    return SparkBackend(project, build_registry())


# -- hand-written equivalents (baseline for the composability bench) ----


def q6_hand_written(lineitem: DataFrame) -> DataFrame:
    return lineitem.where(
        (F.col("l_shipdate") >= F.lit(Q6_DATE_LO))
        & (F.col("l_shipdate") < F.lit(Q6_DATE_HI))
        & (F.col("l_discount").between(Q6_DISC_LO, Q6_DISC_HI))
        & (F.col("l_quantity") < Q6_QTY)
    ).agg(F.sum(F.col("l_extendedprice") * F.col("l_discount")).alias("revenue"))


def q3_hand_written(lineitem: DataFrame, orders: DataFrame, customer: DataFrame) -> DataFrame:
    li = lineitem.where(F.col("l_shipdate") > F.lit(Q3_DATE))
    o = orders.where(F.col("o_orderdate") < F.lit(Q3_DATE))
    c = customer.where(F.col("c_mktsegment") == Q3_SEGMENT)
    return (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .join(c, o.o_custkey == c.c_custkey)
        .groupBy("l_orderkey", "o_orderdate", "o_orderpriority")
        .agg(F.sum(F.col("l_extendedprice") * (1 - F.col("l_discount"))).alias("revenue"))
        .select("l_orderkey", "revenue", "o_orderdate", "o_orderpriority")
    )


#: Oracle SQL run on DuckDB over the same inputs (column aliases match
#: the Spark side exactly, as repro.oracle requires).
Q6_SQL = f"""
SELECT sum(l_extendedprice * l_discount) AS revenue
FROM lineitem
WHERE l_shipdate >= TIMESTAMP '{Q6_DATE_LO} 00:00:00'
  AND l_shipdate < TIMESTAMP '{Q6_DATE_HI} 00:00:00'
  AND l_discount BETWEEN {Q6_DISC_LO} AND {Q6_DISC_HI}
  AND l_quantity < {Q6_QTY}
"""

Q3_SQL = f"""
SELECT l_orderkey,
       sum(l_extendedprice * (1 - l_discount)) AS revenue,
       o_orderdate,
       o_orderpriority
FROM customer, orders, lineitem
WHERE c_mktsegment = '{Q3_SEGMENT}'
  AND c_custkey = o_custkey
  AND l_orderkey = o_orderkey
  AND o_orderdate < TIMESTAMP '{Q3_DATE} 00:00:00'
  AND l_shipdate > TIMESTAMP '{Q3_DATE} 00:00:00'
GROUP BY l_orderkey, o_orderdate, o_orderpriority
"""
