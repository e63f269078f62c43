"""Shared graph fixtures for the test suite (session-scoped, cached)."""
import pytest

from repro.graphgen.rmat import rmat
from repro.graphgen.road import grid_road


@pytest.fixture(scope="session")
def tiny_rmat(spark):
    """~500-edge RMAT graph (128 vertices): fast unit-test workhorse."""
    df = rmat(spark, scale=7, edge_factor=6, seed=11).cache()
    df.count()
    return df


@pytest.fixture(scope="session")
def small_rmat(spark):
    """~2k-edge RMAT graph (512 vertices): quality-comparison workhorse."""
    df = rmat(spark, scale=9, edge_factor=8, seed=3).cache()
    df.count()
    return df


@pytest.fixture(scope="session")
def small_road(spark):
    """~550-edge thinned 20x20 lattice: the non-skewed test graph."""
    df = grid_road(spark, 20, 20, seed=2).cache()
    df.count()
    return df
