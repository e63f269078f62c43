"""A deterministic mixing hash computable identically in Python and Spark SQL.

Spark's ``xxhash64`` has no cheap pure-Python twin, but the reproduction
wants the distributed Distributed-NE run to be *bit-for-bit* comparable
with the lock-step Python reference (tests/test_distributed_ne.py), so
all pseudo-random choices inside the algorithm use this multiplicative
mix instead. Quality requirements are mild (tie-breaking orders, random
vertex draws), for which a Knuth-style multiplicative hash is plenty.
"""
from pyspark.sql import Column
from pyspark.sql import functions as F

MIX_MOD = 2_147_483_647  # 2^31 - 1 (prime)
_MULT = 2_654_435_761  # Knuth multiplicative constant
_PREMOD = 1_000_003


def mix_py(x: int, salt: int) -> int:
    """Deterministic pseudo-random value in [0, MIX_MOD).

    The salt is folded in *before* the multiply so that different salts
    permute the induced ordering (an additive salt would only shift all
    values and leave every argsort identical — seeds must actually
    change the algorithm's random draws).
    """
    return ((x + salt) % _PREMOD + 1) * _MULT % MIX_MOD


def mix_col(col: Column, salt: int) -> Column:
    """Spark twin of :func:`mix_py` (bigint arithmetic, no overflow)."""
    return F.pmod(
        (F.pmod(col + F.lit(salt), F.lit(_PREMOD)) + F.lit(1)) * F.lit(_MULT),
        F.lit(MIX_MOD),
    )
