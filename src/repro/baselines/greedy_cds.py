"""Greedy top-k CDS baseline (kClist++-based, no locality guarantee).

The paper's Figure-14 comparator: run kClist++ (Frank-Wolfe) on the
remaining graph, order vertices by their received weight r, take the
densest prefix as the next "densest subgraph", remove its vertices, and
repeat k times. The returned subgraphs maximize h-clique density greedily
but carry no h-clique-compactness guarantee — they can be fragments
adjacent to an earlier output, which is exactly the failure mode the
LhCDS definition rules out.
"""
from __future__ import annotations

from fractions import Fraction

from ..core.fw import fw_local
from ..core.ippv import LhCDS
from ..graphs.local import LocalGraph


def greedy_topk_cds(lg: LocalGraph, k: int = 5, T: int = 20) -> list[LhCDS]:
    """Top-k h-clique dense subgraphs, greedily, without local guarantees."""
    remaining = set(lg.vertices)
    out: list[LhCDS] = []
    for _ in range(k):
        insts = [t for t in lg.instances if remaining.issuperset(t)]
        if not insts:
            break
        _alpha, r = fw_local(insts, T)
        order = sorted(r, key=lambda v: (-r[v], v))
        pos = {v: i for i, v in enumerate(order)}
        cnt = [0] * len(order)
        for inst in insts:
            cnt[max(pos[v] for v in inst)] += 1
        best_q, best_d, cum = 0, Fraction(0), 0
        for q in range(len(order)):
            cum += cnt[q]
            d = Fraction(cum, q + 1)
            if d > best_d:
                best_d, best_q = d, q
        sub = set(order[: best_q + 1])
        if best_d == 0:
            break
        out.append(LhCDS(frozenset(sub), best_d))
        remaining -= sub
    return out
