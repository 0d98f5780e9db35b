#!/usr/bin/env python
"""Run the TIL-declared TPC-H pipelines (Q6, Q3) on the Spark backend.

A Tydi-typed dataflow: Streamlets declared in TIL with ``spark://``
linked implementations, composed structurally, contract-checked at
every connection, executed as DataFrame transformations over TPC-H-lite
data, and cross-checked against DuckDB.

Usage: spark-submit jobs/spark_pipeline_demo.py  (or plain python)
Env:   REPRO_SF  scale factor (default 0.01)
"""
import os
import sys

sys.path.insert(0, os.path.join(os.path.dirname(__file__), ".."))

from pyspark.sql import SparkSession

from repro import synth_data
from repro.oracle import assert_equivalent
from repro.spark_backend.tpch_demo import Q3_SQL, Q6_SQL, build_backend


def main() -> None:
    sf = float(os.environ.get("REPRO_SF", "0.01"))
    spark = (
        SparkSession.builder.appName("tydi-spark-demo")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )
    li = synth_data.lineitem(spark, sf=sf)
    orders = synth_data.orders(spark, sf=sf)
    customer = synth_data.customer(spark, sf=sf)
    backend = build_backend()

    q6 = backend.run("tpch", "q6", {"lineitem": li})
    revenue = q6["revenue"].collect()[0]["revenue"]
    print(f"Q6 revenue (SF={sf}): {revenue:,.2f}")
    assert_equivalent(q6["revenue"], Q6_SQL, lineitem=li)
    print("Q6 matches DuckDB oracle")

    q3 = backend.run(
        "tpch", "q3", {"lineitem": li, "orders": orders, "customer": customer}
    )
    top = q3["result"].orderBy("revenue", ascending=False).limit(5).collect()
    print(f"Q3 groups: {q3['result'].count()}; top revenue rows:")
    for r in top:
        print(f"  order {r['l_orderkey']}: {r['revenue']:,.2f}")
    assert_equivalent(
        q3["result"], Q3_SQL, lineitem=li, orders=orders, customer=customer
    )
    print("Q3 matches DuckDB oracle")
    spark.stop()


if __name__ == "__main__":
    main()
