#!/usr/bin/env python
"""§7.4 companion: weak scaling of Distributed NE (fixed vertices/part).

The paper fixes 2^22 vertices per machine and scales 4 -> 256 machines
up to the trillion-edge graph (Scale30, EF 1024, 69.7 min on 256
machines). Locally we fix vertices-per-partition and scale the
partition count, reporting wall time and iteration count — the paper's
observed shape is linear growth in elapsed time with machine count.
"""
import argparse
import time

from repro.core.distributed_ne import distributed_ne
from repro.core.metrics import partition_quality
from repro.graphgen.rmat import rmat
from repro.session import build_session
from repro.tables.fmt import render


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--verts-per-part", type=int, default=256)
    ap.add_argument("--edge-factor", type=int, default=16)
    ap.add_argument("--parts", nargs="*", type=int, default=[4, 8, 16, 32])
    args = ap.parse_args()
    spark = build_session("scaling")
    rows = []
    for p in args.parts:
        scale = (p * args.verts_per_part).bit_length() - 1
        edges = rmat(spark, scale=scale, edge_factor=args.edge_factor, seed=0).cache()
        m = edges.count()
        t0 = time.monotonic()
        asg, st = distributed_ne(spark, edges, p, lam=0.5, seed=0, return_stats=True)
        q = partition_quality(asg)
        rows.append(
            {
                "parts": p,
                "scale": scale,
                "edges": m,
                "iters": st.iterations,
                "time_s": round(time.monotonic() - t0, 1),
                "rf": round(q.rf, 3),
            }
        )
        edges.unpersist(blocking=False)
    print(render(rows, title="Weak scaling (fixed vertices/part)"))
    spark.stop()


if __name__ == "__main__":
    main()
