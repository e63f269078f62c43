"""Lock-step pure-Python reference of the parallel-expansion algorithm.

This mirrors, decision for decision, the iteration contract that
``repro.core.distributed_ne`` implements on Spark (documented there).
Tests compare the two **bit-for-bit** on small graphs — any divergence
in tie-breaking, capacity truncation or conflict resolution fails the
suite. It exists purely as an oracle; all experiments run the Spark
implementation.
"""
import math
from collections import defaultdict

from repro.core.hashutil import mix_py
from repro.core.incidence import EID_BASE, eid_py


def _decode(eid: int) -> tuple[int, int]:
    return eid // EID_BASE, eid % EID_BASE


def parallel_ne_reference(
    edge_list: list[tuple[int, int]],
    n_parts: int,
    *,
    alpha: float = 1.1,
    lam: float = 0.1,
    seed: int = 0,
    max_iters: int = 100_000,
) -> tuple[dict[int, int], dict]:
    """Partition canonical (src < dst) edges; returns (eid -> part, stats)."""
    m = len(edge_list)
    if m == 0:
        raise ValueError("empty edge list")
    cap = math.ceil(alpha * m / n_parts)
    adj: dict[int, list[tuple[int, int]]] = defaultdict(list)
    all_eids = []
    for s, d in edge_list:
        e = eid_py(s, d)
        all_eids.append(e)
        adj[s].append((e, d))
        adj[d].append((e, s))
    alloc: dict[int, int] = {}
    vp: dict[int, set[int]] = defaultdict(set)  # vertex -> parts
    vset: dict[int, set[int]] = defaultdict(set)  # part -> vertices
    sizes = [0] * n_parts
    stats = {"iterations": 0, "fallback_edges": 0}
    stall = 0

    for t in range(max_iters):
        if len(alloc) == m:
            break
        active = [p for p in range(n_parts) if sizes[p] < cap]
        if not active:
            break
        stats["iterations"] = t + 1
        salt = seed + t * 7919

        # D_rest over the remaining edges.
        drest: dict[int, int] = {}
        for v, nbrs in adj.items():
            c = sum(1 for e, _ in nbrs if e not in alloc)
            if c:
                drest[v] = c

        # --- vertex selection (Alg. 1 / Alg. 4 multi-expansion) ---
        selected: list[tuple[int, int]] = []
        needy: list[int] = []
        for p in active:
            boundary = sorted((drest[v], v) for v in vset[p] if v in drest)
            if boundary:
                k = max(1, math.ceil(lam * len(boundary)))
                selected.extend((v, p) for _, v in boundary[:k])
            else:
                needy.append(p)
        if needy and drest:
            randomized = sorted(drest, key=lambda v: (mix_py(v, salt), v))
            selected.extend((v, p) for p, v in zip(sorted(needy), randomized))

        # --- one-hop allocation with conflict resolution + capacity ---
        cand_pairs = set()
        for v, p in selected:
            for e, _ in adj[v]:
                if e not in alloc:
                    cand_pairs.add((e, p))
        winner: dict[int, tuple[tuple[int, int], int]] = {}
        for e, p in cand_pairs:
            key = (sizes[p], p)
            if e not in winner or key < winner[e][0]:
                winner[e] = (key, p)
        per_part: dict[int, list[int]] = defaultdict(list)
        for e, (_, p) in winner.items():
            per_part[p].append(e)
        new1: list[tuple[int, int]] = []
        for p, eids in per_part.items():
            eids.sort()
            budget = max(0, cap - sizes[p])
            new1.extend((e, p) for e in eids[:budget])
        for e, p in new1:
            alloc[e] = p
            sizes[p] += 1
            a, b = _decode(e)
            vp[a].add(p)
            vp[b].add(p)
            vset[p].add(a)
            vset[p].add(b)

        # --- two-hop allocation (Condition (5): replication-free edges) ---
        cand2: dict[int, list[int]] = defaultdict(list)
        for e in all_eids:
            if e in alloc:
                continue
            a, b = _decode(e)
            common = [p for p in vp[a] & vp[b] if sizes[p] < cap]
            if common:
                p2 = min(common, key=lambda p: (sizes[p], p))
                cand2[p2].append(e)
        new2: list[tuple[int, int]] = []
        for p, eids in cand2.items():
            eids.sort()
            budget = max(0, cap - sizes[p])
            new2.extend((e, p) for e in eids[:budget])
        for e, p in new2:
            alloc[e] = p
            sizes[p] += 1

        progress = len(new1) + len(new2)
        stall = 0 if progress else stall + 1
        if stall >= 2:
            break

    # --- fallback for leftover edges (cf. §7.3 isolated-edge remnants) ---
    leftovers = [e for e in all_eids if e not in alloc]
    stats["fallback_edges"] = len(leftovers)
    frozen = list(sizes)
    for e in sorted(leftovers):
        a, b = _decode(e)
        union = vp[a] | vp[b]
        if union:
            p = min(union, key=lambda q: (frozen[q], q))
        else:
            p = mix_py(e, seed) % n_parts
        alloc[e] = p
        sizes[p] += 1
    return alloc, stats
