"""Edge/incidence DataFrame builders shared by partitioners.

The paper stores the input graph 2D-hash-partitioned in CSR across
allocation processes (§4): edges are unique, vertices replicated. Our
Spark equivalent is an *incidence table* ``(v, eid, other)`` with both
directions of every undirected edge — hash-distributed by Spark, with
edge ids derived functionally (xxhash64 of the canonical endpoint pair,
mirroring the paper's "metadata is functionally computed instead of
storing them").
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


EID_BASE = 1 << 32


def with_eid(edges: DataFrame) -> DataFrame:
    """Attach a deterministic edge id: eid = src * 2^32 + dst.

    Collision-free for vertex ids < 2^32 (all graphs in this repo are
    << 2^20 vertices), and computable identically in pure Python, which
    lets tests compare the Spark Distributed NE against the lock-step
    Python reference bit-for-bit.
    """
    return edges.withColumn(
        "eid", F.col("src") * F.lit(EID_BASE) + F.col("dst")
    )


def eid_py(src: int, dst: int) -> int:
    """Python twin of ``with_eid``'s edge id."""
    return src * EID_BASE + dst


def incidence(edges_with_eid: DataFrame) -> DataFrame:
    """Both directions of each edge: (v, eid, other). 2|E| rows."""
    fwd = edges_with_eid.select(
        F.col("src").alias("v"), "eid", F.col("dst").alias("other")
    )
    bwd = edges_with_eid.select(
        F.col("dst").alias("v"), "eid", F.col("src").alias("other")
    )
    return fwd.unionAll(bwd)


def degrees(edges: DataFrame) -> DataFrame:
    """(v, degree) for every vertex appearing in the edge list."""
    return (
        edges.select(F.col("src").alias("v"))
        .unionAll(edges.select(F.col("dst").alias("v")))
        .groupBy("v")
        .agg(F.count(F.lit(1)).alias("degree"))
    )
