"""Harnesses that regenerate the paper's evaluation tables.

Each ``tableN`` module exposes ``tableN_rows(...) -> list[dict]`` plus
the paper's printed numbers (``PAPER``) so EXPERIMENTS.md can diff
paper vs measured. ``jobs/tableN.py`` are the spark-submit wrappers;
``benchmarks/bench_tableN.py`` time them.
"""
