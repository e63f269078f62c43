"""Vertex partitioners (Spinner, XtraPuLP-like, ParMETIS-like, Sheep-like)
and the vertex->edge conversion."""
from pyspark.sql import functions as F

from repro.core.metrics import assert_valid_assignment, partition_quality
from repro.partitioners.convert import vertex_to_edge
from repro.partitioners.hashing import random_hash
from repro.partitioners.labelprop import (
    spinner,
    spinner_labels,
    xtrapulp_labels,
    xtrapulp_like,
)
from repro.partitioners.multilevel import parmetis_like
from repro.partitioners.sheep import sheep_like


# ---------- conversion ----------
def test_convert_uses_endpoint_labels(spark):
    edges = spark.createDataFrame([(0, 1), (1, 2)], "src long, dst long")
    labels = spark.createDataFrame([(0, 3), (1, 3), (2, 3)], "v long, label int")
    asg = vertex_to_edge(edges, labels, 4, seed=0)
    assert {r["part"] for r in asg.collect()} == {3}


def test_convert_handles_missing_labels(spark):
    edges = spark.createDataFrame([(0, 1), (2, 3)], "src long, dst long")
    labels = spark.createDataFrame([(0, 2)], "v long, label int")
    asg = vertex_to_edge(edges, labels, 4, seed=0)
    got = {(r["src"], r["dst"]): r["part"] for r in asg.collect()}
    assert got[(0, 1)] == 2  # falls back to the labelled endpoint
    assert 0 <= got[(2, 3)] < 4  # hash fallback in range


def test_convert_count_preserved(spark, tiny_rmat):
    labels = spinner_labels(spark, tiny_rmat, 4, seed=0, n_iters=2)
    asg = vertex_to_edge(tiny_rmat, labels, 4, seed=0)
    assert asg.count() == tiny_rmat.count()


# ---------- spinner ----------
def test_spinner_labels_cover_all_vertices(spark, tiny_rmat):
    labels = spinner_labels(spark, tiny_rmat, 4, seed=0, n_iters=3)
    n_vertices = (
        tiny_rmat.select(F.col("src").alias("v"))
        .unionAll(tiny_rmat.select(F.col("dst").alias("v")))
        .distinct()
        .count()
    )
    assert labels.count() == n_vertices
    assert labels.select("v").distinct().count() == n_vertices


def test_spinner_labels_in_range(spark, tiny_rmat):
    labels = spinner_labels(spark, tiny_rmat, 4, seed=0, n_iters=3)
    bad = labels.filter((F.col("label") < 0) | (F.col("label") >= 4)).count()
    assert bad == 0


def test_spinner_improves_over_random_conversion(spark, small_road):
    """On a road network LP finds contiguous regions: far better RF than
    converting random labels."""
    rf_spinner = partition_quality(spinner(spark, small_road, 4, seed=0, n_iters=8)).rf
    rf_rand = partition_quality(random_hash(spark, small_road, 4, seed=0)).rf
    assert rf_spinner < rf_rand


# ---------- xtrapulp ----------
def test_xtrapulp_labels_cover_all(spark, small_road):
    labels = xtrapulp_labels(spark, small_road, 4, seed=0, max_bfs_iters=20, refine_iters=1)
    n_vertices = (
        small_road.select(F.col("src").alias("v"))
        .unionAll(small_road.select(F.col("dst").alias("v")))
        .distinct()
        .count()
    )
    assert labels.count() == n_vertices


def test_xtrapulp_near_ideal_on_road(spark, small_road):
    """Table 6 shape: XtraPuLP-like reaches RF ~ 1.0-1.3 on roads."""
    q = partition_quality(
        xtrapulp_like(spark, small_road, 4, seed=0, max_bfs_iters=20, refine_iters=2)
    )
    assert q.rf < 1.5


# ---------- parmetis-like ----------
def test_parmetis_valid_and_good_on_road(spark, small_road):
    asg = parmetis_like(spark, small_road, 4, seed=0)
    assert_valid_assignment(asg, small_road, 4)
    assert partition_quality(asg).rf < 1.5


def test_parmetis_beats_random_on_rmat(spark, small_rmat):
    rf_pm = partition_quality(parmetis_like(spark, small_rmat, 8, seed=0)).rf
    rf_rand = partition_quality(random_hash(spark, small_rmat, 8, seed=0)).rf
    assert rf_pm < rf_rand


# ---------- sheep-like ----------
def test_sheep_valid_and_good_on_road(spark, small_road):
    asg = sheep_like(spark, small_road, 4, seed=0)
    assert_valid_assignment(asg, small_road, 4)
    assert partition_quality(asg).rf < 1.6


def test_sheep_balanced(spark, small_rmat):
    """Subtree bin-packing by owned edges keeps edge balance tight."""
    q = partition_quality(sheep_like(spark, small_rmat, 8, seed=0))
    assert q.eb < 1.3


def test_sheep_beats_random(spark, small_rmat):
    rf_sheep = partition_quality(sheep_like(spark, small_rmat, 8, seed=0)).rf
    rf_rand = partition_quality(random_hash(spark, small_rmat, 8, seed=0)).rf
    assert rf_sheep < rf_rand
