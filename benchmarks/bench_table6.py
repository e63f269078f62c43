"""Benchmark + regeneration of Table 6 (road networks, 8 partitioners)."""
from repro.tables.fmt import render
from repro.tables.table6 import table6_rows


def test_bench_table6(benchmark, spark, emit):
    rows = benchmark.pedantic(
        lambda: table6_rows(spark, n_parts=16, seed=0, lam=0.1),
        rounds=1,
        iterations=1,
    )
    emit("table6", render(rows, title="Table 6 — road networks RF, |P|=16"))
