"""Hash-based edge partitioners: Random (1D), Grid (2D), DBH, Hybrid.

All are pure Catalyst expressions (xxhash64) — the paper's "lightweight
hash calculation" family (§2.2) — plus the degree computation for DBH
and Hybrid (one aggregation + joins).
"""
import math

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.incidence import degrees


def random_hash(
    spark: SparkSession, edges: DataFrame, n_parts: int, *, seed: int = 0
) -> DataFrame:
    """1D random hash: every edge to a uniform pseudo-random partition."""
    return edges.select(
        "src",
        "dst",
        F.pmod(F.xxhash64("src", "dst", F.lit(seed)), F.lit(n_parts))
        .cast("int")
        .alias("part"),
    )


def _grid_shape(n_parts: int) -> tuple[int, int]:
    """Factor n_parts into the most square r x c grid (r <= c)."""
    r = int(math.isqrt(n_parts))
    while n_parts % r != 0:
        r -= 1
    return r, n_parts // r


def grid_hash(
    spark: SparkSession, edges: DataFrame, n_parts: int, *, seed: int = 0
) -> DataFrame:
    """2D (grid) hash: part = (h(src) mod r, h(dst) mod c).

    Each vertex's edges are confined to one grid row or column, so its
    replicas are bounded by r + c - 1 — the constrained placement that
    Distributed NE itself uses for the *initial* distribution (§4).
    """
    r, c = _grid_shape(n_parts)
    row = F.pmod(F.xxhash64("src", F.lit(seed)), F.lit(r))
    col = F.pmod(F.xxhash64("dst", F.lit(seed + 1)), F.lit(c))
    return edges.select(
        "src", "dst", (row * F.lit(c) + col).cast("int").alias("part")
    )


def dbh(
    spark: SparkSession, edges: DataFrame, n_parts: int, *, seed: int = 0
) -> DataFrame:
    """Degree-based hashing [49]: hash each edge by its lower-degree endpoint."""
    deg = degrees(edges)
    d_src = deg.withColumnRenamed("v", "src").withColumnRenamed("degree", "dsrc")
    d_dst = deg.withColumnRenamed("v", "dst").withColumnRenamed("degree", "ddst")
    key = F.when(F.col("dsrc") <= F.col("ddst"), F.col("src")).otherwise(
        F.col("dst")
    )
    return (
        edges.join(d_src, "src")
        .join(d_dst, "dst")
        .select(
            "src",
            "dst",
            F.pmod(F.xxhash64(key, F.lit(seed)), F.lit(n_parts))
            .cast("int")
            .alias("part"),
        )
    )


def hybrid_hash(
    spark: SparkSession,
    edges: DataFrame,
    n_parts: int,
    *,
    seed: int = 0,
    theta: int | None = None,
) -> DataFrame:
    """PowerLyra hybrid-cut [13]: group a low-degree vertex's edges together.

    An edge is hashed by its ``dst`` endpoint when deg(dst) <= theta
    (low-cut: low-degree vertices keep their edges on one machine), and
    by ``src`` otherwise (high-cut: high-degree vertices are split).
    PowerLyra's default threshold is 100; for the ``_lite`` graphs the
    default scales as 4x the average degree.
    """
    deg = degrees(edges).cache()
    if theta is None:
        row = deg.agg(F.avg("degree").alias("a")).first()
        theta = max(4, int(4 * row["a"]))
    d_dst = deg.withColumnRenamed("v", "dst").withColumnRenamed("degree", "ddst")
    key = F.when(F.col("ddst") <= F.lit(theta), F.col("dst")).otherwise(
        F.col("src")
    )
    out = edges.join(d_dst, "dst").select(
        "src",
        "dst",
        F.pmod(F.xxhash64(key, F.lit(seed)), F.lit(n_parts))
        .cast("int")
        .alias("part"),
    )
    deg.unpersist(blocking=False)
    return out
