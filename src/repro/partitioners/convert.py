"""Vertex-partition -> edge-partition conversion (Bourse et al. [9]).

The paper compares vertex partitioners (ParMETIS, Spinner, XtraPuLP) on
edge-partitioning quality by assigning every edge to a random endpoint's
vertex partition (§7.1). ``vertex_to_edge`` implements exactly that with
a deterministic coin (xxhash64 parity).
"""
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def vertex_to_edge(
    edges: DataFrame, labels: DataFrame, n_parts: int, *, seed: int = 0
) -> DataFrame:
    """Edge part = partition label of a pseudo-randomly chosen endpoint.

    ``labels`` is (v, label); vertices missing from it fall back to the
    other endpoint's label, then to a hash partition.
    """
    lsrc = labels.select(F.col("v").alias("src"), F.col("label").alias("lsrc"))
    ldst = labels.select(F.col("v").alias("dst"), F.col("label").alias("ldst"))
    coin = F.pmod(F.xxhash64("src", "dst", F.lit(seed)), F.lit(2))
    pick = F.when(coin == 0, F.coalesce("lsrc", "ldst")).otherwise(
        F.coalesce("ldst", "lsrc")
    )
    fallback = F.pmod(F.xxhash64("src", "dst", F.lit(seed + 1)), F.lit(n_parts))
    return (
        edges.join(lsrc, "src", "left")
        .join(ldst, "dst", "left")
        .select(
            "src",
            "dst",
            F.coalesce(pick, fallback).cast("int").alias("part"),
        )
    )
