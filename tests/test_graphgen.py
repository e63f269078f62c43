"""Generators: canonical form, determinism, structure, dataset registry."""
import numpy as np
import pytest

from repro.graphgen.datasets import (
    DATASETS,
    ROAD_GRAPHS,
    TABLE4_GRAPHS,
    TABLE5_GRAPHS,
    load_dataset,
)
from repro.graphgen.locality import locality_edges_np
from repro.graphgen.rmat import rmat, rmat_edges_np
from repro.graphgen.road import grid_road_edges_np
from repro.graphgen.special import (
    complete_edges_np,
    complete_graph,
    path_graph,
    ring_edges_np,
    ring_graph,
    ring_plus_complete,
    star_graph,
)
from repro.graphgen.util import canonicalize_np, graph_counts


def _assert_canonical(pairs: np.ndarray) -> None:
    assert pairs.dtype == np.int64
    assert (pairs[:, 0] < pairs[:, 1]).all(), "src < dst violated"
    assert len(np.unique(pairs, axis=0)) == len(pairs), "duplicate edges"


# ---------- canonicalize ----------
def test_canonicalize_drops_self_loops():
    out = canonicalize_np(np.array([1, 2, 3]), np.array([1, 5, 2]))
    assert [tuple(r) for r in out] == [(2, 3), (2, 5)]


def test_canonicalize_orients_and_dedups():
    out = canonicalize_np(np.array([5, 2, 2]), np.array([2, 5, 5]))
    assert [tuple(r) for r in out] == [(2, 5)]


def test_canonicalize_empty():
    out = canonicalize_np(np.array([], dtype=int), np.array([], dtype=int))
    assert len(out) == 0


# ---------- rmat ----------
@pytest.mark.parametrize("scale,ef", [(6, 4), (8, 8), (10, 16)])
def test_rmat_canonical(scale, ef):
    _assert_canonical(rmat_edges_np(scale, ef, seed=1))


def test_rmat_deterministic():
    a = rmat_edges_np(8, 8, seed=5)
    b = rmat_edges_np(8, 8, seed=5)
    assert np.array_equal(a, b)


def test_rmat_seed_changes_graph():
    a = rmat_edges_np(8, 8, seed=5)
    b = rmat_edges_np(8, 8, seed=6)
    assert not np.array_equal(a, b)


def test_rmat_vertex_range():
    pairs = rmat_edges_np(7, 4, seed=0)
    assert pairs.max() < 2**7
    assert pairs.min() >= 0


def test_rmat_is_skewed():
    """Graph500 RMAT must have a heavy-tailed degree distribution."""
    pairs = rmat_edges_np(10, 16, seed=0)
    deg = np.bincount(pairs.ravel())
    deg = deg[deg > 0]
    assert deg.max() > 10 * np.median(deg)


def test_rmat_uniform_params_not_skewed():
    """a=b=c=0.25 gives an Erdos-Renyi-like flat degree distribution."""
    pairs = rmat_edges_np(10, 16, seed=0, a=0.25, b=0.25, c=0.25)
    deg = np.bincount(pairs.ravel())
    deg = deg[deg > 0]
    assert deg.max() <= 6 * np.median(deg)


def test_rmat_bad_probs_raise():
    with pytest.raises(ValueError):
        rmat_edges_np(5, 2, a=0.5, b=0.5, c=0.2)


def test_rmat_spark_roundtrip(spark):
    df = rmat(spark, scale=6, edge_factor=4, seed=2)
    n, m = graph_counts(df)
    assert m == len(rmat_edges_np(6, 4, seed=2))
    assert 0 < n <= 64


# ---------- special graphs ----------
def test_complete_graph_counts(spark):
    n, m = graph_counts(complete_graph(spark, 6))
    assert (n, m) == (6, 15)


def test_ring_graph_counts(spark):
    n, m = graph_counts(ring_graph(spark, 7))
    assert (n, m) == (7, 7)


def test_ring_too_small():
    with pytest.raises(ValueError):
        ring_edges_np(2)


def test_path_graph_counts(spark):
    n, m = graph_counts(path_graph(spark, 9))
    assert (n, m) == (9, 8)


def test_star_graph_counts(spark):
    n, m = graph_counts(star_graph(spark, 5))
    assert (n, m) == (6, 5)


def test_ring_plus_complete_matches_theorem2(spark):
    """K_n + ring: |V| = n(n-1)/2 + n, |E| = n(n-1) (Theorem 2 setup)."""
    n = 5
    nv, ne = graph_counts(ring_plus_complete(spark, n))
    assert nv == n * (n - 1) // 2 + n
    assert ne == n * (n - 1)


def test_complete_edges_offset_disjoint():
    a = complete_edges_np(4)
    b = complete_edges_np(4, offset=10)
    assert set(a.ravel()).isdisjoint(set(b.ravel()))


# ---------- road ----------
def test_road_canonical():
    _assert_canonical(grid_road_edges_np(15, 15, seed=1))


def test_road_full_grid_edge_count():
    pairs = grid_road_edges_np(10, 12, keep_prob=1.0)
    assert len(pairs) == 10 * 11 + 9 * 12  # horizontal + vertical


def test_road_density_ratio():
    pairs = grid_road_edges_np(60, 60, keep_prob=0.71, seed=3)
    n = len(np.unique(pairs.ravel()))
    ratio = len(pairs) / n
    assert 1.2 < ratio < 1.6  # SNAP road networks sit at ~1.41


def test_road_low_max_degree():
    pairs = grid_road_edges_np(30, 30, seed=4)
    deg = np.bincount(pairs.ravel())
    assert deg.max() <= 4


def test_road_bad_keep_prob():
    with pytest.raises(ValueError):
        grid_road_edges_np(5, 5, keep_prob=0.0)


def test_road_deterministic():
    assert np.array_equal(
        grid_road_edges_np(12, 12, seed=9), grid_road_edges_np(12, 12, seed=9)
    )


# ---------- locality ----------
def test_locality_canonical():
    _assert_canonical(locality_edges_np(256, 8, seed=1))


def test_locality_deterministic():
    assert np.array_equal(
        locality_edges_np(128, 4, seed=2), locality_edges_np(128, 4, seed=2)
    )


def test_locality_gaps_are_local():
    """Most edges connect nearby ids (mod wraparound)."""
    n = 1024
    pairs = locality_edges_np(n, 8, gap_alpha=1.6, seed=0)
    gap = np.minimum(pairs[:, 1] - pairs[:, 0], n - (pairs[:, 1] - pairs[:, 0]))
    assert np.median(gap) < n / 20


def test_locality_contiguous_cut_is_cheap():
    """A contiguous 4-way split of the id space must cut few edges —
    the structural property that gives WebUK its near-ideal RF."""
    n = 1024
    pairs = locality_edges_np(n, 8, gap_alpha=1.6, seed=0)
    part = pairs // (n // 4)
    cut = (part[:, 0] != part[:, 1]).mean()
    assert cut < 0.35


# ---------- datasets ----------
def test_dataset_registry_covers_tables():
    for name in TABLE4_GRAPHS + TABLE5_GRAPHS + ROAD_GRAPHS:
        assert name in DATASETS


def test_dataset_unknown_name(spark):
    with pytest.raises(KeyError):
        load_dataset(spark, "nope")


@pytest.mark.parametrize("name", ["pokec_lite", "calif_lite", "webuk_lite"])
def test_dataset_generates(spark, name):
    n, m = graph_counts(load_dataset(spark, name))
    assert n > 100 and m > n


def test_dataset_edge_factor_ordering(spark):
    """orkut_lite must be denser than flickr_lite (38 vs 14 draws/vertex),
    mirroring the originals' edge factors."""
    no, mo = graph_counts(load_dataset(spark, "orkut_lite"))
    nf, mf = graph_counts(load_dataset(spark, "flickr_lite"))
    assert mo / no > 1.5 * (mf / nf)
