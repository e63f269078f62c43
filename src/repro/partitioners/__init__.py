"""Baseline partitioners the paper compares against (§7.1).

All partitioners share one contract: ``fn(spark, edges, n_parts, *,
seed=0, **kw) -> DataFrame(src, dst, part)`` over canonical undirected
edges, deterministic in ``seed``. ``PARTITIONERS`` is the registry the
table harnesses iterate over.
"""
from repro.partitioners.api import PARTITIONERS, get_partitioner

__all__ = ["PARTITIONERS", "get_partitioner"]
