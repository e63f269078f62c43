"""Benchmark + regeneration of Table 2 (dataset inventory)."""
from repro.tables.fmt import render
from repro.tables.table2 import table2_rows


def test_bench_table2(benchmark, spark, emit):
    rows = benchmark.pedantic(table2_rows, args=(spark,), rounds=1, iterations=1)
    emit("table2", render(rows, title="Table 2 — datasets (paper vs _lite substitutes)"))
