"""Per-partition parallel verification == sequential fast verification."""
import random

import pytest

from repro.core.bruteforce import brute_lhcds
from repro.core.verify import verify_fast
from repro.flow.networks import compact_numbers_exact, is_densest
from repro.flow.parallel import verify_many
from repro.graphs.cores import instance_core_numbers_local
from repro.graphs.local import LocalGraph


def _random_graph(seed):
    rng = random.Random(seed)
    n = rng.randint(7, 10)
    p = rng.uniform(0.35, 0.7)
    return LocalGraph(
        n_hint=n,
        edges=[(i, j) for i in range(n) for j in range(i + 1, n) if rng.random() < p],
    )


def _core_bounds(lg):
    cores = instance_core_numbers_local(lg.vertices, lg.instances)
    return (
        {v: float(cores.get(v, 0)) for v in lg.vertices},
        {v: cores.get(v, 0) / lg.p for v in lg.vertices},
    )


def _self_densest_candidates(lg, rng, limit=6):
    from repro.core.bruteforce import _Masks

    mk = _Masks(lg)
    cands = []
    for mask in range(1, 1 << mk.n):
        if not mk.connected(mask) or mk.count[mask] == 0:
            continue
        S = {mk.verts[i] for i in range(mk.n) if mask >> i & 1}
        if is_densest(sorted(S), lg.instances_within(S), lg.p):
            cands.append(S)
    rng.shuffle(cands)
    return cands[:limit]


@pytest.mark.parametrize("seed", range(5))
def test_verify_many_matches_sequential(spark, seed):
    lg = _random_graph(seed).with_cliques(3)
    ub, lb = _core_bounds(lg)
    rng = random.Random(seed)
    cands = _self_densest_candidates(lg, rng)
    if not cands:
        pytest.skip("no candidates in this draw")
    got = verify_many(spark, lg, cands, ub, lb)
    ref = [verify_fast(lg, S, ub, lb, {}) for S in cands]
    assert got == ref


def test_verify_many_finds_true_lhcds(spark):
    lg = _random_graph(42).with_cliques(3)
    ub, lb = _core_bounds(lg)
    true_sets = [set(S) for S, d in brute_lhcds(lg) if d > 0]
    if not true_sets:
        pytest.skip("no positive-density LhCDS in this draw")
    assert all(verify_many(spark, lg, true_sets, ub, lb))
