#!/usr/bin/env python
"""Figure 6 companion: iterations and RF of Distributed NE vs lambda.

Figures are out of scope for the reproduction, but this sweep documents
the multi-expansion trade-off (§5): iterations drop roughly linearly in
log-lambda while RF degrades only at lambda -> 1.
"""
import argparse

from repro.core.distributed_ne import distributed_ne
from repro.core.metrics import partition_quality
from repro.graphgen.rmat import rmat
from repro.session import build_session
from repro.tables.fmt import render


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--parts", type=int, default=32)
    ap.add_argument("--scale", type=int, default=11)
    ap.add_argument("--edge-factor", type=int, default=16)
    ap.add_argument("--lams", nargs="*", type=float, default=[0.01, 0.1, 0.5, 1.0])
    args = ap.parse_args()
    spark = build_session("lambda-sweep")
    edges = rmat(spark, scale=args.scale, edge_factor=args.edge_factor, seed=0).cache()
    edges.count()
    rows = []
    for lam in args.lams:
        asg, st = distributed_ne(
            spark, edges, args.parts, lam=lam, seed=0, return_stats=True
        )
        q = partition_quality(asg)
        rows.append({"lambda": lam, "iterations": st.iterations, "rf": round(q.rf, 3)})
    print(render(rows, title=f"Fig. 6 sweep — RMAT scale{args.scale}, |P|={args.parts}"))
    spark.stop()


if __name__ == "__main__":
    main()
