#!/usr/bin/env python
"""Regenerate Table 6 (replication factor on road networks, 8 methods)."""
import argparse

from repro.session import build_session
from repro.tables.fmt import render
from repro.tables.table6 import table6_rows


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--parts", type=int, default=16)
    ap.add_argument("--seed", type=int, default=0)
    args = ap.parse_args()
    spark = build_session("table6")
    rows = table6_rows(spark, n_parts=args.parts, seed=args.seed)
    print(render(rows, title=f"Table 6 — road networks, |P|={args.parts}"))
    spark.stop()


if __name__ == "__main__":
    main()
