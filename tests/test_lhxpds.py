"""LhxPDS (section 5): the generic pipeline over 4-vertex pattern instances."""
import random
from itertools import combinations

import pytest

from repro.core.bruteforce import brute_lhcds
from repro.core.ippv import ippv_instances, ippv_local
from repro.graphs import edgelist as el
from repro.graphs import patterns as pt
from repro.graphs.local import LocalGraph


def _pattern_instances_brute(lg: LocalGraph, pattern: str):
    ne_ref, md_ref = pt.PATTERNS_4[pattern]
    out = []
    for quad in combinations(lg.vertices, 4):
        if not lg.is_connected(set(quad)):
            continue
        es = [(a, b) for a, b in combinations(quad, 2) if lg.has_edge(a, b)]
        deg = {v: 0 for v in quad}
        for a, b in es:
            deg[a] += 1
            deg[b] += 1
        if (len(es), max(deg.values())) == (ne_ref, md_ref):
            out.append(tuple(sorted(quad)))
    return out


def _random_graph(seed):
    rng = random.Random(seed)
    n = rng.randint(7, 10)
    p = rng.uniform(0.35, 0.6)
    return LocalGraph(
        n_hint=n,
        edges=[(i, j) for i in range(n) for j in range(i + 1, n) if rng.random() < p],
    )


def _with_pattern(lg, pattern):
    return LocalGraph(
        n_hint=lg.n_hint,
        edges=list(lg.edges),
        instances=_pattern_instances_brute(lg, pattern),
        p=4,
    )


@pytest.mark.parametrize("seed", range(6))
@pytest.mark.parametrize("pattern", ["clique4", "diamond", "cycle4", "paw", "star4", "path4"])
def test_lhxpds_exact_vs_bruteforce(seed, pattern):
    lg = _with_pattern(_random_graph(seed), pattern)
    ref = sorted(((tuple(sorted(S)), d) for S, d in brute_lhcds(lg) if d > 0))
    got = sorted(
        (tuple(sorted(r.vertices)), r.density) for r in ippv_local(lg, k=None)
    )
    assert got == ref


@pytest.mark.parametrize("pattern", ["diamond", "cycle4"])
def test_lhxpds_spark_pipeline(spark, pattern):
    import pandas as pd

    lg = _random_graph(11)
    pdf = pd.DataFrame(lg.edges, columns=["src", "dst"])
    edges = el.edges_from_pandas(spark, pdf)
    inst = pt.pattern_instances(edges, pattern)
    got = sorted(
        (tuple(sorted(r.vertices)), r.density)
        for r in ippv_instances(spark, edges, inst, p=4, k=None, T=4)
    )
    ref = sorted(
        (tuple(sorted(r.vertices)), r.density)
        for r in ippv_local(_with_pattern(lg, pattern), k=None, T=4)
    )
    assert got == ref


def test_lhxpds_all_patterns_on_case_study(spark):
    """Figure-17 analogue: L4xPDS per pattern on the polbooks-like graph
    (tiny subsample for test speed)."""
    from repro import synth_data as sd

    pdf = sd.planted_communities_pd(
        n=60, m_background=90, blocks=[(8, 0.9), (7, 0.85)], seed=91
    )
    edges = el.edges_from_pandas(spark, pdf)
    found = {}
    for pattern in sorted(pt.PATTERNS_4):
        inst = pt.pattern_instances(edges, pattern)
        res = ippv_instances(spark, edges, inst, p=4, k=2, T=4)
        found[pattern] = [(r.size, float(r.density)) for r in res]
    # different patterns yield different LhxPDS structures (paper's point)
    assert len({tuple(v) for v in found.values()}) > 1
