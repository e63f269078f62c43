"""RF/EB/VB metrics — hand examples plus DuckDB oracle cross-checks."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.metrics import (
    assert_valid_assignment,
    edge_counts,
    partition_quality,
    replicas,
    vertex_counts,
)
from repro.oracle import assert_equivalent
from repro.partitioners.hashing import random_hash


@pytest.fixture(scope="module")
def toy_assignment(spark):
    """Figure-1-style toy: 6 edges over 2 parts with one cut vertex (2)."""
    rows = [
        (0, 1, 0),
        (0, 2, 0),
        (1, 2, 0),
        (2, 3, 1),
        (3, 4, 1),
        (2, 4, 1),
    ]
    return spark.createDataFrame(rows, "src long, dst long, part int").cache()


def test_quality_toy_values(toy_assignment):
    q = partition_quality(toy_assignment)
    # V(E_0) = {0,1,2}, V(E_1) = {2,3,4} -> 6 replicas over 5 vertices.
    assert q.rf == pytest.approx(6 / 5)
    assert q.eb == pytest.approx(1.0)
    assert q.vb == pytest.approx(1.0)
    assert q.n_vertices == 5
    assert q.n_edges == 6
    assert q.n_parts_used == 2


def test_quality_single_part(spark):
    asg = spark.createDataFrame([(0, 1, 0), (1, 2, 0)], "src long, dst long, part int")
    q = partition_quality(asg)
    assert q.rf == pytest.approx(1.0)
    assert q.eb == 1.0 and q.vb == 1.0


def test_quality_empty_raises(spark):
    empty = spark.createDataFrame([], "src long, dst long, part int")
    with pytest.raises(Exception):
        partition_quality(empty)


def test_replicas_distinct(toy_assignment):
    assert replicas(toy_assignment).count() == 6


def test_edge_counts(toy_assignment):
    got = {r["part"]: r["edges"] for r in edge_counts(toy_assignment).collect()}
    assert got == {0: 3, 1: 3}


def test_vertex_counts(toy_assignment):
    got = {r["part"]: r["vertices"] for r in vertex_counts(toy_assignment).collect()}
    assert got == {0: 3, 1: 3}


# ---------- DuckDB oracle cross-checks ----------
def _asg_pdf(asg) -> pd.DataFrame:
    return asg.toPandas()


def test_oracle_replica_counts(spark, small_rmat):
    asg = random_hash(spark, small_rmat, 8, seed=1).cache()
    spark_df = (
        replicas(asg).groupBy("part").agg(F.count(F.lit(1)).alias("n_replicas"))
    )
    sql = """
        SELECT part, count(*) AS n_replicas FROM (
            SELECT DISTINCT part, v FROM (
                SELECT part, src AS v FROM asg
                UNION ALL
                SELECT part, dst AS v FROM asg
            )
        ) GROUP BY part
    """
    assert_equivalent(spark_df, sql, asg=_asg_pdf(asg))
    asg.unpersist(blocking=False)


def test_oracle_edge_counts(spark, small_rmat):
    asg = random_hash(spark, small_rmat, 8, seed=1).cache()
    spark_df = edge_counts(asg)
    assert_equivalent(
        spark_df, "SELECT part, count(*) AS edges FROM asg GROUP BY part", asg=_asg_pdf(asg)
    )
    asg.unpersist(blocking=False)


def test_oracle_rf_scalar(spark, small_rmat):
    """RF computed by partition_quality equals the SQL definition."""
    asg = random_hash(spark, small_rmat, 8, seed=1).cache()
    q = partition_quality(asg)
    spark_df = spark.createDataFrame([(float(q.rf),)], "rf double").select(
        F.round("rf", 6).alias("rf")
    )
    sql = """
        SELECT round(
            (SELECT count(*) FROM (
                SELECT DISTINCT part, v FROM (
                    SELECT part, src AS v FROM asg
                    UNION ALL SELECT part, dst AS v FROM asg)
            )) * 1.0 /
            (SELECT count(DISTINCT v) FROM (
                SELECT src AS v FROM asg UNION ALL SELECT dst AS v FROM asg)),
            6) AS rf
    """
    assert_equivalent(spark_df, sql, asg=_asg_pdf(asg))
    asg.unpersist(blocking=False)


# ---------- validity checker ----------
def test_valid_assignment_passes(spark, tiny_rmat):
    asg = random_hash(spark, tiny_rmat, 4, seed=0)
    assert_valid_assignment(asg, tiny_rmat, 4)


def test_valid_assignment_catches_out_of_range(spark, tiny_rmat):
    asg = random_hash(spark, tiny_rmat, 4, seed=0).withColumn(
        "part", F.col("part") + 10
    )
    with pytest.raises(AssertionError):
        assert_valid_assignment(asg, tiny_rmat, 4)


def test_valid_assignment_catches_missing_edges(spark, tiny_rmat):
    asg = random_hash(spark, tiny_rmat, 4, seed=0).limit(5)
    with pytest.raises(AssertionError):
        assert_valid_assignment(asg, tiny_rmat, 4)


def test_valid_assignment_catches_duplicates(spark, tiny_rmat):
    asg = random_hash(spark, tiny_rmat, 4, seed=0)
    with pytest.raises(AssertionError):
        assert_valid_assignment(asg.unionAll(asg.limit(3)), tiny_rmat, 4)
