"""Hash-family specifics: grid confinement, DBH rule, hybrid rule, quality."""
import pytest
from pyspark.sql import functions as F

from repro.core.incidence import degrees
from repro.core.metrics import partition_quality, replicas
from repro.partitioners.hashing import (
    _grid_shape,
    dbh,
    grid_hash,
    hybrid_hash,
    random_hash,
)


@pytest.mark.parametrize("p,shape", [(4, (2, 2)), (16, (4, 4)), (64, (8, 8)), (12, (3, 4)), (7, (1, 7))])
def test_grid_shape(p, shape):
    assert _grid_shape(p) == shape


def test_grid_replicas_confined(spark, small_rmat):
    """Every vertex's replicas fit in one row + one column of the grid."""
    p = 16
    r, c = _grid_shape(p)
    asg = grid_hash(spark, small_rmat, p, seed=0)
    worst = (
        replicas(asg).groupBy("v").agg(F.count(F.lit(1)).alias("n")).agg(F.max("n")).first()[0]
    )
    assert worst <= r + c - 1


def test_random_replicas_unbounded_vs_grid(spark, small_rmat):
    """2D hash must beat 1D hash on RF (paper Table 5: 2D-R < Rand)."""
    rf_rand = partition_quality(random_hash(spark, small_rmat, 16, seed=0)).rf
    rf_grid = partition_quality(grid_hash(spark, small_rmat, 16, seed=0)).rf
    assert rf_grid < rf_rand


def test_dbh_beats_random(spark, small_rmat):
    rf_rand = partition_quality(random_hash(spark, small_rmat, 16, seed=0)).rf
    rf_dbh = partition_quality(dbh(spark, small_rmat, 16, seed=0)).rf
    assert rf_dbh < rf_rand


def test_dbh_high_degree_vertex_is_split(spark):
    """In a star, the hub's edges are hashed by the leaves (lower degree),
    so the hub is replicated while each leaf stays on one part."""
    from repro.graphgen.special import star_graph

    star = star_graph(spark, 64)
    asg = dbh(spark, star, 8, seed=0)
    hub_parts = replicas(asg).filter(F.col("v") == 0).count()
    assert hub_parts == 8  # hub replicated everywhere
    leaf_parts = (
        replicas(asg).filter(F.col("v") != 0).groupBy("v").agg(F.count(F.lit(1)).alias("n"))
    )
    assert leaf_parts.agg(F.max("n")).first()[0] == 1


def test_hybrid_low_degree_edges_grouped(spark):
    """With a huge theta every edge is hashed by dst -> each dst's edges
    land on a single partition."""
    from repro.graphgen.rmat import rmat

    g = rmat(spark, scale=7, edge_factor=4, seed=9)
    asg = hybrid_hash(spark, g, 8, seed=0, theta=10**9)
    per_dst = asg.groupBy("dst").agg(F.count_distinct("part").alias("n"))
    assert per_dst.agg(F.max("n")).first()[0] == 1


def test_hybrid_theta_zero_hashes_by_src(spark, tiny_rmat):
    asg = hybrid_hash(spark, tiny_rmat, 8, seed=0, theta=0)
    per_src = asg.groupBy("src").agg(F.count_distinct("part").alias("n"))
    assert per_src.agg(F.max("n")).first()[0] == 1


def test_degree_join_consistency(spark, tiny_rmat):
    """DBH output count survives its two degree joins (no row blowup)."""
    assert dbh(spark, tiny_rmat, 4, seed=0).count() == tiny_rmat.count()
    assert degrees(tiny_rmat).count() > 0
