"""TPC-H workload (Section 5.1.2): the Q18 subquery
``SELECT L_ORDERKEY, SUM(L_QUANTITY) FROM LINEITEM GROUP BY L_ORDERKEY``
with LINEITEM partitioned over fragments by ``L_SUPPKEY mod F`` — the
paper's modulo hash distribution. Each order's ~4 line items land on
random suppliers, so every orderkey is scattered over a few fragments:
partial cross-fragment overlap and a high-cardinality aggregate.
"""
from __future__ import annotations

from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro import synth_data
from repro.engine.aggspec import sum_spec
from repro.workloads.base import Workload


def q18_workload(
    spark: SparkSession, *, sf: float = 0.01, n_frags: int = 8, seed: int = 0
) -> Workload:
    li = synth_data.lineitem(spark, sf=sf, seed=seed)
    df = li.select(
        F.pmod(F.col("l_suppkey"), F.lit(n_frags)).cast("int").alias("frag"),
        F.col("l_orderkey").cast("long").alias("l_orderkey"),
        F.col("l_quantity").alias("l_quantity"),
    )
    return Workload(
        name=f"tpch_q18(sf={sf})",
        df=df,
        spec=sum_spec("l_orderkey", "l_quantity", key_out="orderkey", out="sum_qty"),
        sql="SELECT l_orderkey AS orderkey, SUM(l_quantity) AS sum_qty "
        "FROM r GROUP BY l_orderkey",
        n_frags=n_frags,
        tuple_bytes=16.0,
    )
