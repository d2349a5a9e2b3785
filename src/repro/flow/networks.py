"""The paper's flow networks, solved exactly (Fractions scaled to ints).

Three constructions, all driver-side (the networks are deliberately small
— the fast verifier's whole point is shrinking them — and capacities must
be exact rationals):

- ``derive_compact``: Algorithm 4's DeriveCompact(G, rho, P). Given a
  vertex set, its inner instances, and optionally the boundary instance
  set P (instances with ``cnt < h`` members inside, Algorithm 5), computes
  the union of all maximal h-clique rho-compact subgraphs via one min-cut
  (Theorem 5). The caller passes ``rho`` already *including* the
  ``-1/|V|^2`` slack, as an exact Fraction.
- ``is_densest``: the kClist++ self-densest check — is there a strictly
  denser subgraph inside G[S]? One min-cut on the hyperedge
  densest-subgraph network at density rho + 1/(2|S|^2).
- ``densest_sub`` / ``exact_decomposition``: exact maximal densest
  subgraph (Dinkelbach iteration, terminating because the density strictly
  increases and takes rational values with denominator <= n) and the
  diminishingly-dense decomposition by marginal density. By Theorem 2 the
  block densities are exactly the h-clique compact numbers; this is the
  exactness fallback and the flow-exact baseline (LTDS/LDSflow stand-in).
"""
from __future__ import annotations

import math
from fractions import Fraction
from typing import Iterable, Mapping, Sequence

from .dinic import Dinic

Instance = tuple[int, ...]


def _scaled(caps: list[Fraction]) -> list[int]:
    """Scale a capacity list by the lcm of denominators; exact ints out."""
    L = 1
    for c in caps:
        L = math.lcm(L, c.denominator)
    return [int(c * L) for c in caps]


def derive_compact(
    vertices: Sequence[int],
    instances: Sequence[Instance],
    h: int,
    rho: Fraction,
    boundary: Sequence[tuple[Instance, int]] = (),
) -> set[int]:
    """Union of all maximal h-clique rho-compact subgraphs (Theorem 5).

    ``instances`` are the instances fully inside ``vertices``;
    ``boundary`` holds Algorithm 5's P: pairs ``(members_inside, cnt)``
    where ``members_inside`` are the instance's vertices inside the
    region and ``cnt = len(members_inside)``. Returns the vertex set of
    the maximal min-cut source side.
    """
    verts = list(vertices)
    vid = {v: i + 1 for i, v in enumerate(verts)}  # 0 = source
    n_nodes = 1 + len(verts) + len(instances) + len(boundary) + 1
    t = n_nodes - 1
    inst_base = 1 + len(verts)
    bnd_base = inst_base + len(instances)

    deg: dict[int, Fraction] = {v: Fraction(0) for v in verts}
    arcs: list[tuple[int, int, Fraction]] = []
    for i, inst in enumerate(instances):
        nid = inst_base + i
        for v in inst:
            arcs.append((nid, vid[v], Fraction(h - 1)))
            arcs.append((vid[v], nid, Fraction(1)))
            deg[v] += 1
    for j, (members, cnt) in enumerate(boundary):
        nid = bnd_base + j
        share = 1 + Fraction(h - cnt, cnt)
        for v in members:
            arcs.append((nid, vid[v], Fraction(h - 1)))
            arcs.append((vid[v], nid, share))
            deg[v] += share
    for v in verts:
        arcs.append((vid[v], t, rho * h))
        arcs.append((0, vid[v], deg[v]))

    caps = _scaled([c for _, _, c in arcs])
    net = Dinic(n_nodes)
    for (u, w, _), c in zip(arcs, caps):
        net.add_edge(u, w, c)
    net.max_flow(0, t)
    side = net.max_cut_source_side(t)
    return {v for v in verts if vid[v] in side}


def is_densest(
    vertices: Sequence[int], instances: Sequence[Instance], p: int
) -> bool:
    """True iff no subgraph of G[vertices] is strictly denser (instance
    density) than G[vertices] itself."""
    verts = list(vertices)
    n = len(verts)
    if n == 0:
        raise ValueError("empty candidate")
    k = len(instances)
    if k == 0:
        return True  # density 0; no subgraph can be denser than 0? subgraphs also 0
    rho = Fraction(k, n) + Fraction(1, 2 * n * n)
    vid = {v: i + 1 for i, v in enumerate(verts)}
    inst_base = 1 + n
    t = inst_base + k
    net_caps: list[tuple[int, int, Fraction]] = []
    for i, inst in enumerate(instances):
        net_caps.append((0, inst_base + i, Fraction(1)))
        for v in inst:
            net_caps.append((inst_base + i, vid[v], Fraction(k + 1)))  # effectively inf
    for v in verts:
        net_caps.append((vid[v], t, rho))
    caps = _scaled([c for _, _, c in net_caps])
    scale = caps[0]  # capacity of a unit arc after scaling
    net = Dinic(t + 1)
    for (u, w, _), c in zip(net_caps, caps):
        net.add_edge(u, w, c)
    flow = net.max_flow(0, t)
    # min cut == k  <=>  max over S' of |Psi(S')| - rho|S'| == 0 (empty set)
    return flow == k * scale


def densest_sub(
    vertices: Iterable[int], hyperedges: Mapping[Instance, int]
) -> tuple[set[int], Fraction]:
    """Maximal densest subgraph for weighted hyperedges, exactly.

    Maximizes ``f(S)/|S|`` where ``f(S)`` sums the weights of hyperedges
    fully inside S. Dinkelbach iteration: at the current density rho,
    extract the maximal maximizer of ``f(S) - rho|S|``; a strictly
    positive value yields a strictly denser S, otherwise the maximal
    maximizer is the maximal densest subgraph.
    """
    verts = [v for v in vertices]
    if not verts:
        return set(), Fraction(0)
    W = sum(hyperedges.values())
    if W == 0:
        return set(verts), Fraction(0)
    vid = {v: i + 1 for i, v in enumerate(verts)}
    edges = list(hyperedges.items())
    inst_base = 1 + len(verts)
    t = inst_base + len(edges)

    def solve(rho: Fraction) -> tuple[set[int], Fraction]:
        # direct integer scaling by rho's denominator (cheaper than a
        # generic lcm pass; every other capacity is already integral)
        L = rho.denominator
        net = Dinic(t + 1)
        inf = (W + 1) * L
        for i, (members, w) in enumerate(edges):
            net.add_edge(0, inst_base + i, w * L)
            for v in members:
                net.add_edge(inst_base + i, vid[v], inf)
        for v in verts:
            net.add_edge(vid[v], t, rho.numerator)
        net.max_flow(0, t)
        side = net.max_cut_source_side(t)
        S = {v for v in verts if vid[v] in side}
        fS = sum(w for members, w in edges if all(v in S for v in members))
        return S, (Fraction(fS, len(S)) if S else Fraction(0))

    rho = Fraction(0)
    best: set[int] = set(verts)
    while True:
        S, d = solve(rho)
        if S and d > rho:
            rho, best = d, S
        else:
            # at rho == max density, the maximal maximizer of f - rho|S|
            # is the maximal densest subgraph (value 0 achieved by it)
            if S:
                best = S
            return best, rho


def exact_decomposition(
    vertices: Iterable[int], instances: Sequence[Instance]
) -> list[tuple[set[int], Fraction]]:
    """Diminishingly-dense decomposition by marginal instance density.

    Returns blocks ``(B_i, rho_i)`` with strictly decreasing ``rho_i``;
    by Theorem 2, ``phi_h(u) = rho_i`` for every ``u`` in block ``B_i``.
    """
    remaining = set(vertices)
    done: set[int] = set()
    blocks: list[tuple[set[int], Fraction]] = []
    while remaining:
        hyper: dict[Instance, int] = {}
        for inst in instances:
            rest = tuple(sorted(set(inst) - done))
            if rest:
                hyper[rest] = hyper.get(rest, 0) + 1
        if not hyper:
            blocks.append((set(remaining), Fraction(0)))
            break
        S, d = densest_sub(remaining, hyper)
        if d == 0:
            blocks.append((set(remaining), Fraction(0)))
            break
        assert not blocks or d < blocks[-1][1], "block densities must decrease"
        blocks.append((S, d))
        done |= S
        remaining -= S
    return blocks


def compact_numbers_exact(
    vertices: Iterable[int], instances: Sequence[Instance]
) -> dict[int, Fraction]:
    """Exact h-clique compact numbers phi_h(u) via the decomposition."""
    out: dict[int, Fraction] = {}
    for block, d in exact_decomposition(vertices, instances):
        for v in block:
            out[v] = d
    return out
