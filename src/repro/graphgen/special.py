"""Small structured graphs used by theory tests (Theorem 2) and unit tests."""
import numpy as np
from pyspark.sql import DataFrame, SparkSession

from repro.graphgen.util import canonicalize_np, edges_to_spark


def complete_edges_np(n: int, *, offset: int = 0) -> np.ndarray:
    """All C(n, 2) edges among vertices offset..offset+n-1."""
    i, j = np.triu_indices(n, k=1)
    return canonicalize_np(i + offset, j + offset)


def ring_edges_np(n: int, *, offset: int = 0) -> np.ndarray:
    """Cycle of length n on vertices offset..offset+n-1 (n >= 3)."""
    if n < 3:
        raise ValueError("a ring needs at least 3 vertices")
    v = np.arange(n, dtype=np.int64)
    return canonicalize_np(v + offset, (v + 1) % n + offset)


def complete_graph(spark: SparkSession, n: int) -> DataFrame:
    return edges_to_spark(spark, complete_edges_np(n))


def ring_graph(spark: SparkSession, n: int) -> DataFrame:
    return edges_to_spark(spark, ring_edges_np(n))


def path_graph(spark: SparkSession, n: int) -> DataFrame:
    """Simple path 0-1-...-(n-1)."""
    v = np.arange(n - 1, dtype=np.int64)
    return edges_to_spark(spark, canonicalize_np(v, v + 1))


def star_graph(spark: SparkSession, n_leaves: int) -> DataFrame:
    """Hub vertex 0 connected to leaves 1..n_leaves."""
    leaves = np.arange(1, n_leaves + 1, dtype=np.int64)
    return edges_to_spark(spark, canonicalize_np(np.zeros_like(leaves), leaves))


def ring_plus_complete(spark: SparkSession, n: int) -> DataFrame:
    """The Theorem-2 tightness construction: a K_n plus a disjoint ring.

    The complete part has n vertices and n(n-1)/2 edges; the ring has
    n(n-1)/2 vertices and the same number of edges, so |E| = n(n-1).
    """
    kn = complete_edges_np(n)
    ring_n = n * (n - 1) // 2
    ring = ring_edges_np(ring_n, offset=n)
    return edges_to_spark(spark, np.concatenate([kn, ring], axis=0))
