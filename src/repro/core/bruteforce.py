"""Brute-force oracles straight from the paper's definitions.

Exponential-time reference implementations for tiny graphs (n <= ~12):

- ``compactness``: the largest rho such that G[S] is instance
  rho-compact (Definition 1) — the min over nonempty subsets S' of
  removed-instances(S') / |S'|, provided G[S] is connected.
- ``brute_compact_numbers``: phi_h(u) by Definition 4 (max compactness
  over connected subsets containing u).
- ``brute_lhcds``: all LhCDSes by Definition 2 (self-compact at own
  density + no compact connected supergraph), densest first.

These validate every exact claim of the pipeline in tests; they are the
ground truth the Spark implementation is diffed against.
"""
from __future__ import annotations

from fractions import Fraction

from ..graphs.local import LocalGraph


class _Masks:
    """Bitmask toolkit over a LocalGraph's vertices + instances."""

    def __init__(self, lg: LocalGraph) -> None:
        if lg.instances is None:
            raise ValueError("attach instances first (LocalGraph.with_cliques)")
        self.verts = list(lg.vertices)
        self.idx = {v: i for i, v in enumerate(self.verts)}
        self.n = len(self.verts)
        if self.n > 20:
            raise ValueError("brute force limited to tiny graphs")
        self.inst_masks = [
            sum(1 << self.idx[v] for v in inst) for inst in lg.instances
        ]
        self.adj_masks = [0] * self.n
        for u, v in lg.edges:
            self.adj_masks[self.idx[u]] |= 1 << self.idx[v]
            self.adj_masks[self.idx[v]] |= 1 << self.idx[u]
        # instance count fully inside each subset mask
        self.count = [0] * (1 << self.n)
        for mask in range(1 << self.n):
            c = 0
            for im in self.inst_masks:
                if im & ~mask == 0:
                    c += 1
            self.count[mask] = c

    def connected(self, mask: int) -> bool:
        if mask == 0:
            return False
        start = mask & -mask
        seen = start
        frontier = start
        while frontier:
            nxt = 0
            m = frontier
            while m:
                b = m & -m
                m ^= b
                nxt |= self.adj_masks[b.bit_length() - 1]
            frontier = nxt & mask & ~seen
            seen |= frontier
        return seen == mask

    def compactness(self, mask: int) -> Fraction | None:
        """Largest rho with G[mask] rho-compact; None if disconnected."""
        if not self.connected(mask):
            return None
        total = self.count[mask]
        best: Fraction | None = None
        # iterate nonempty submasks S' of mask
        sub = mask
        while sub:
            removed = total - self.count[mask & ~sub]
            r = Fraction(removed, bin(sub).count("1"))
            if best is None or r < best:
                best = r
            sub = (sub - 1) & mask
        return best

    def density(self, mask: int) -> Fraction:
        k = bin(mask).count("1")
        return Fraction(self.count[mask], k) if k else Fraction(0)


def brute_compact_numbers(lg: LocalGraph) -> dict[int, Fraction]:
    """phi(u) for every vertex, by Definition 4."""
    mk = _Masks(lg)
    phi = {v: Fraction(0) for v in mk.verts}
    for mask in range(1, 1 << mk.n):
        c = mk.compactness(mask)
        if c is None:
            continue
        m = mask
        while m:
            b = m & -m
            m ^= b
            v = mk.verts[b.bit_length() - 1]
            if c > phi[v]:
                phi[v] = c
    return phi


def brute_lhcds(lg: LocalGraph) -> list[tuple[set[int], Fraction]]:
    """All LhCDSes by Definition 2, sorted densest first."""
    mk = _Masks(lg)
    comp = {}
    for mask in range(1, 1 << mk.n):
        comp[mask] = mk.compactness(mask)
    out: list[tuple[set[int], Fraction]] = []
    for mask in range(1, 1 << mk.n):
        c = comp[mask]
        if c is None:
            continue
        d = mk.density(mask)
        if c != d:
            continue  # not rho-compact at its own density
        # maximality: no connected strict superset that is d-compact
        maximal = True
        for sup, csup in comp.items():
            if sup != mask and (sup & mask) == mask and csup is not None and csup >= d:
                maximal = False
                break
        if maximal:
            vs = {
                mk.verts[i] for i in range(mk.n) if mask >> i & 1
            }
            out.append((vs, d))
    out.sort(key=lambda t: (-t[1], sorted(t[0])))
    return out
