"""Sequential NE / SNE: capacity, quality ordering, expansion behaviour."""
import math

import pytest

from repro.core.metrics import partition_quality
from repro.partitioners.greedy_streaming import hdrf
from repro.partitioners.hashing import random_hash
from repro.partitioners.ne_sequential import ne_sequential, sne


def test_ne_respects_capacity(spark, small_rmat):
    m = small_rmat.count()
    n_parts, alpha = 8, 1.1
    q = partition_quality(ne_sequential(spark, small_rmat, n_parts, alpha=alpha, seed=0))
    cap = math.ceil(alpha * m / n_parts)
    assert q.eb * (m / n_parts) <= cap + 1e-9


def test_sne_respects_capacity(spark, small_rmat):
    m = small_rmat.count()
    n_parts, alpha = 8, 1.1
    q = partition_quality(sne(spark, small_rmat, n_parts, alpha=alpha, seed=0))
    cap = math.ceil(alpha * m / n_parts)
    assert q.eb * (m / n_parts) <= cap + 1e-9


def test_ne_beats_random_and_hdrf(spark, small_rmat):
    """Table 4 ordering: NE has the best RF of the sequential family."""
    rf_ne = partition_quality(ne_sequential(spark, small_rmat, 8, seed=0)).rf
    rf_hdrf = partition_quality(hdrf(spark, small_rmat, 8, seed=0)).rf
    rf_rand = partition_quality(random_hash(spark, small_rmat, 8, seed=0)).rf
    assert rf_ne < rf_hdrf < rf_rand


def test_ne_near_ideal_on_ring(spark):
    """A ring splits into contiguous arcs: only the arc endpoints are
    replicated, so RF <= 1 + 2P/|V|."""
    from repro.graphgen.special import ring_graph

    ring = ring_graph(spark, 128)
    q = partition_quality(ne_sequential(spark, ring, 4, seed=0))
    assert q.rf <= 1.0 + 2 * 4 / 128 + 1e-9


def test_ne_single_partition_is_trivial(spark, tiny_rmat):
    q = partition_quality(ne_sequential(spark, tiny_rmat, 1, seed=0))
    assert q.rf == pytest.approx(1.0)


def test_sne_between_hdrf_and_ne(spark, small_rmat):
    """SNE's limited lookahead costs quality vs offline NE (Table 4)."""
    rf_ne = partition_quality(ne_sequential(spark, small_rmat, 8, seed=0)).rf
    rf_sne = partition_quality(sne(spark, small_rmat, 8, seed=0)).rf
    assert rf_ne <= rf_sne


def test_sne_more_batches_not_better(spark, small_rmat):
    """Shrinking the window (more batches) cannot improve on one batch
    (= offline visibility)."""
    rf_1 = partition_quality(sne(spark, small_rmat, 8, seed=0, n_batches=1)).rf
    rf_16 = partition_quality(sne(spark, small_rmat, 8, seed=0, n_batches=16)).rf
    assert rf_1 <= rf_16 + 0.3
