"""Partitioner registry mapping paper names to implementations."""
from typing import Callable

from pyspark.sql import DataFrame, SparkSession


def _lazy(module: str, fn: str) -> Callable:
    def call(spark: SparkSession, edges: DataFrame, n_parts: int, **kw):
        import importlib

        return getattr(importlib.import_module(module), fn)(
            spark, edges, n_parts, **kw
        )

    call.__name__ = fn
    return call


#: name (as used in the paper's tables) -> partitioner callable
PARTITIONERS: dict[str, Callable] = {
    # hash family
    "random": _lazy("repro.partitioners.hashing", "random_hash"),
    "grid": _lazy("repro.partitioners.hashing", "grid_hash"),
    "dbh": _lazy("repro.partitioners.hashing", "dbh"),
    "hybrid": _lazy("repro.partitioners.hashing", "hybrid_hash"),
    # greedy / streaming family
    "oblivious": _lazy("repro.partitioners.greedy_streaming", "oblivious"),
    "hdrf": _lazy("repro.partitioners.greedy_streaming", "hdrf"),
    "hybrid_ginger": _lazy("repro.partitioners.ginger", "hybrid_ginger"),
    # sequential expansion family (Table 4)
    "ne": _lazy("repro.partitioners.ne_sequential", "ne_sequential"),
    "sne": _lazy("repro.partitioners.ne_sequential", "sne"),
    # vertex partitioners converted to edge partitions (Bourse et al.)
    "spinner": _lazy("repro.partitioners.labelprop", "spinner"),
    "xtrapulp": _lazy("repro.partitioners.labelprop", "xtrapulp_like"),
    "parmetis": _lazy("repro.partitioners.multilevel", "parmetis_like"),
    "sheep": _lazy("repro.partitioners.sheep", "sheep_like"),
    # the paper's contribution
    "distributed_ne": _lazy("repro.core.distributed_ne", "distributed_ne"),
}


def get_partitioner(name: str) -> Callable:
    if name not in PARTITIONERS:
        raise KeyError(f"unknown partitioner {name!r}; known: {sorted(PARTITIONERS)}")
    return PARTITIONERS[name]
