"""Core of the reproduction: Distributed NE and its analysis tools."""
from repro.core.distributed_ne import distributed_ne
from repro.core.metrics import partition_quality
from repro.core.bounds import theorem1_ub, dne_powerlaw_ub

__all__ = ["distributed_ne", "partition_quality", "theorem1_ub", "dne_powerlaw_ub"]
