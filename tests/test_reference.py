"""Pure-Python parallel-expansion reference: standalone sanity checks."""
import math

import pytest

from repro.core.incidence import eid_py
from repro.core.reference import parallel_ne_reference
from repro.graphgen.rmat import rmat_edges_np
from repro.graphgen.special import complete_edges_np, ring_edges_np


def _pairs(arr):
    return [tuple(r) for r in arr]


def _rf(alloc: dict[int, int]) -> float:
    reps = set()
    verts = set()
    for e, p in alloc.items():
        a, b = e >> 32, e & 0xFFFFFFFF
        reps.add((a, p))
        reps.add((b, p))
        verts.add(a)
        verts.add(b)
    return len(reps) / len(verts)


def test_reference_covers_all_edges():
    pairs = _pairs(rmat_edges_np(7, 4, seed=0))
    alloc, _ = parallel_ne_reference(pairs, 4, seed=0)
    assert set(alloc) == {eid_py(s, d) for s, d in pairs}


def test_reference_capacity():
    pairs = _pairs(rmat_edges_np(7, 4, seed=0))
    alloc, st = parallel_ne_reference(pairs, 4, alpha=1.1, seed=0)
    cap = math.ceil(1.1 * len(pairs) / 4)
    sizes = {}
    for p in alloc.values():
        sizes[p] = sizes.get(p, 0) + 1
    assert max(sizes.values()) <= cap + st["fallback_edges"]


def test_reference_theorem1():
    pairs = _pairs(rmat_edges_np(8, 6, seed=1))
    alloc, _ = parallel_ne_reference(pairs, 8, seed=1)
    n_v = len({v for e in pairs for v in e})
    assert _rf(alloc) <= (len(pairs) + n_v + 8) / n_v


def test_reference_ring_contiguous():
    alloc, _ = parallel_ne_reference(_pairs(ring_edges_np(64)), 4, lam=0.5, seed=0)
    assert _rf(alloc) <= 1.0 + 2 * 4 / 64 + 0.05


def test_reference_complete_graph_one_part_dominates():
    """K_8 into 2 parts: capacity forces a split, but every vertex ends
    up in at most 2 parts (RF <= 2)."""
    alloc, _ = parallel_ne_reference(_pairs(complete_edges_np(8)), 2, seed=0)
    assert _rf(alloc) <= 2.0


def test_reference_empty_raises():
    with pytest.raises(ValueError):
        parallel_ne_reference([], 4)


def test_reference_deterministic():
    pairs = _pairs(rmat_edges_np(7, 4, seed=5))
    a, _ = parallel_ne_reference(pairs, 4, seed=9)
    b, _ = parallel_ne_reference(pairs, 4, seed=9)
    assert a == b


def test_reference_lambda_iteration_tradeoff():
    pairs = _pairs(rmat_edges_np(8, 6, seed=2))
    _, st_lo = parallel_ne_reference(pairs, 4, lam=1e-9, seed=0)
    _, st_hi = parallel_ne_reference(pairs, 4, lam=1.0, seed=0)
    assert st_hi["iterations"] < st_lo["iterations"]


def test_reference_lambda_one_few_iterations():
    """Fig. 6: at lambda = 1.0 the iteration count collapses to ~10."""
    pairs = _pairs(rmat_edges_np(9, 8, seed=3))
    _, st = parallel_ne_reference(pairs, 8, lam=1.0, seed=0)
    assert st["iterations"] <= 20
