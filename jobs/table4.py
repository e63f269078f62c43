#!/usr/bin/env python
"""Regenerate Table 4 (RF + time vs sequential HDRF/NE/SNE, 64 parts)."""
import argparse

from repro.session import build_session
from repro.tables.fmt import render
from repro.tables.table4 import table4_rows


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--parts", type=int, default=64)
    ap.add_argument("--graphs", nargs="*", default=None)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = build_session("table4")
    rows = table4_rows(spark, n_parts=args.parts, graphs=args.graphs, seed=args.seed)
    print(render(rows, title=f"Table 4 — sequential vs Distributed NE, |P|={args.parts}"))
    spark.stop()


if __name__ == "__main__":
    main()
