"""Road-network-like graphs: 2D lattices with random edge thinning.

Substitute for the SNAP roadNet-CA/PA/TX graphs in Table 6 (offline
container, no downloads). Real road networks are near-planar with
|E|/|V| around 1.4 and tiny maximum degree — a thinned grid has exactly
those properties, which is what makes vertex-partitioners (ParMETIS,
Sheep, XtraPuLP) and Distributed NE all reach RF close to 1 on them.
"""
import numpy as np
from pyspark.sql import DataFrame, SparkSession

from repro.graphgen.util import canonicalize_np, edges_to_spark


def grid_road_edges_np(
    rows: int, cols: int, *, keep_prob: float = 0.71, seed: int = 0
) -> np.ndarray:
    """Thinned rows x cols lattice as a canonical edge array.

    keep_prob=0.71 matches the |E|/|V| ~ 1.41 of SNAP road networks.
    """
    if not 0 < keep_prob <= 1:
        raise ValueError("keep_prob must be in (0, 1]")
    r, c = np.meshgrid(np.arange(rows), np.arange(cols), indexing="ij")
    vid = (r * cols + c).astype(np.int64)
    horiz_src = vid[:, :-1].ravel()
    horiz_dst = vid[:, 1:].ravel()
    vert_src = vid[:-1, :].ravel()
    vert_dst = vid[1:, :].ravel()
    src = np.concatenate([horiz_src, vert_src])
    dst = np.concatenate([horiz_dst, vert_dst])
    rng = np.random.default_rng(seed)
    keep = rng.random(len(src)) < keep_prob
    return canonicalize_np(src[keep], dst[keep])


def grid_road(
    spark: SparkSession,
    rows: int,
    cols: int,
    *,
    keep_prob: float = 0.71,
    seed: int = 0,
) -> DataFrame:
    """Thinned lattice road network as a Spark edge DataFrame."""
    return edges_to_spark(
        spark, grid_road_edges_np(rows, cols, keep_prob=keep_prob, seed=seed)
    )
