"""Benchmark + regeneration of Table 1 (theoretical bounds, pure math)."""
from repro.tables.fmt import render
from repro.tables.table1 import table1_rows


def test_bench_table1(benchmark, emit):
    rows = benchmark.pedantic(table1_rows, rounds=3, iterations=1)
    emit("table1", render(rows, title="Table 1 — theoretical UB of RF, |P|=256"))
