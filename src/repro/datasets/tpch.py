"""TPC-H-lite as an engine database (third schema for generality tests).

The engine uses name-based natural joins, so foreign keys are renamed to
their referenced key's name (``o_orderkey -> l_orderkey`` etc.) — the
standard trick to express TPC-H's snowflake as a natural-join tree::

    customer -- orders -- lineitem -- part
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro import synth_data
from repro.core.database import Database
from repro.core.schema import JoinTree, Relation


def tpch_tree() -> JoinTree:
    """Join tree over the renamed TPC-H-lite relations."""
    return JoinTree(
        relations=[
            Relation(
                "lineitem",
                (
                    "l_orderkey",
                    "l_partkey",
                    "l_linenumber",
                    "l_quantity",
                    "l_extendedprice",
                    "l_discount",
                    "l_tax",
                    "l_returnflag",
                    "l_linestatus",
                ),
            ),
            Relation(
                "orders",
                ("l_orderkey", "o_custkey", "o_orderstatus", "o_totalprice", "o_orderpriority"),
            ),
            Relation("customer", ("o_custkey", "c_nationkey", "c_acctbal", "c_mktsegment")),
            Relation("part", ("l_partkey", "p_type", "p_brand", "p_size", "p_retailprice")),
        ],
        edges=[("lineitem", "orders"), ("orders", "customer"), ("lineitem", "part")],
    )


def tpch_db(spark: SparkSession, *, sf: float = 0.01, seed: int = 0) -> Database:
    """TPC-H-lite at ``sf`` with FK columns renamed for natural joins.

    Date columns are dropped: they are not join keys and keeping the
    frames all-scalar-numeric/string simplifies oracle comparison.
    """
    li = synth_data.lineitem(spark, sf=sf, seed=seed).drop("l_shipdate")
    o = (
        synth_data.orders(spark, sf=sf, seed=seed + 1)
        .drop("o_orderdate")
        .withColumnRenamed("o_orderkey", "l_orderkey")
    )
    c = synth_data.customer(spark, sf=sf, seed=seed + 2).withColumnRenamed(
        "c_custkey", "o_custkey"
    )
    p = synth_data.part(spark, sf=sf, seed=seed + 5).withColumnRenamed(
        "p_partkey", "l_partkey"
    )
    return Database(
        tpch_tree(), {"lineitem": li, "orders": o, "customer": c, "part": p}
    )
