"""Benchmark + regeneration of Table 4 (vs sequential HDRF/NE/SNE).

Paper config: 64 partitions, lambda = 0.1, the four mid-size social
graphs. Wall times of the sequential baselines are in-process numpy;
Distributed NE pays local-mode Spark scheduling per round, so absolute
times are not comparable to the paper's 64-machine MPI runs — RF is.
"""
from repro.tables.fmt import render
from repro.tables.table4 import table4_rows


def test_bench_table4(benchmark, spark, bench_parts, emit):
    rows = benchmark.pedantic(
        lambda: table4_rows(spark, n_parts=bench_parts, seed=0, lam=0.1),
        rounds=1,
        iterations=1,
    )
    emit("table4", render(rows, title=f"Table 4 — RF + time, |P|={bench_parts}, lambda=0.1"))
