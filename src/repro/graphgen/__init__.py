"""Synthetic graph generators for the Distributed NE reproduction.

All generators return an undirected, canonicalized Spark edge DataFrame
with schema ``(src: long, dst: long)`` where ``src < dst``, no self-loops
and no duplicate edges. Every generator is deterministic in ``seed``.
"""
from repro.graphgen.rmat import rmat, rmat_edges_np
from repro.graphgen.road import grid_road
from repro.graphgen.locality import locality_graph
from repro.graphgen.special import (
    complete_graph,
    path_graph,
    ring_graph,
    ring_plus_complete,
    star_graph,
)
from repro.graphgen.datasets import DATASETS, load_dataset

__all__ = [
    "rmat",
    "rmat_edges_np",
    "grid_road",
    "locality_graph",
    "complete_graph",
    "path_graph",
    "ring_graph",
    "ring_plus_complete",
    "star_graph",
    "DATASETS",
    "load_dataset",
]
