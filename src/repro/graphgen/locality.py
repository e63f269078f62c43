"""Locality (web-like) graph generator.

Substitute for the WebUK crawl in Tables 2/5. Web graphs have strong
host-level locality: most links connect ids that are close in crawl
order, so good partitioners reach a near-ideal replication factor
(the paper reports RF < 1.1 for Sheep/XtraPuLP/Distributed NE on WebUK).
We reproduce that structure by drawing edge endpoints as ``(v, v + g)``
where the gap ``g`` follows a power law — heavy locality with a long
tail of cross links — which RMAT cannot produce.
"""
import numpy as np
from pyspark.sql import DataFrame, SparkSession

from repro.graphgen.util import canonicalize_np, edges_to_spark


def locality_edges_np(
    n: int,
    edge_factor: int,
    *,
    gap_alpha: float = 1.6,
    seed: int = 0,
) -> np.ndarray:
    """Canonical edge array with power-law-gap locality.

    ``gap_alpha`` > 1 controls locality: larger alpha = tighter locality
    (lower replication factor achievable by a contiguous partitioning).
    """
    m = n * edge_factor
    rng = np.random.default_rng(seed)
    src = rng.integers(0, n, m, dtype=np.int64)
    # Power-law gaps via inverse-CDF sampling on [1, n): P(g) ~ g^-alpha.
    u = rng.random(m)
    gmax = float(n - 1)
    gaps = np.floor((1.0 + u * (gmax ** (1.0 - gap_alpha) - 1.0)) ** (1.0 / (1.0 - gap_alpha))).astype(np.int64)
    gaps = np.clip(gaps, 1, n - 1)
    sign = np.where(rng.random(m) < 0.5, -1, 1)
    dst = np.mod(src + sign * gaps, n)
    return canonicalize_np(src, dst)


def locality_graph(
    spark: SparkSession,
    *,
    n: int,
    edge_factor: int,
    gap_alpha: float = 1.6,
    seed: int = 0,
) -> DataFrame:
    """Web-like locality graph as a Spark edge DataFrame."""
    return edges_to_spark(
        spark, locality_edges_np(n, edge_factor, gap_alpha=gap_alpha, seed=seed)
    )
