"""Baselines: flow-exact (LTDS/LDSflow stand-in) and Greedy CDS."""
import random
from fractions import Fraction

import pytest

from repro import synth_data as sd
from repro.baselines.flow_exact import flow_exact_lhcds
from repro.baselines.greedy_cds import greedy_topk_cds
from repro.core.bruteforce import brute_lhcds
from repro.graphs.local import LocalGraph, local_from_pandas


def _random_graph(seed):
    rng = random.Random(seed)
    n = rng.randint(6, 10)
    p = rng.uniform(0.3, 0.7)
    return LocalGraph(
        n_hint=n,
        edges=[(i, j) for i in range(n) for j in range(i + 1, n) if rng.random() < p],
    )


@pytest.mark.parametrize("seed", range(12))
@pytest.mark.parametrize("h", [2, 3])
def test_flow_exact_vs_bruteforce(seed, h):
    lg = _random_graph(seed).with_cliques(h)
    ref = sorted(((tuple(sorted(S)), d) for S, d in brute_lhcds(lg) if d > 0))
    got = sorted(
        (tuple(sorted(r.vertices)), r.density) for r in flow_exact_lhcds(lg, k=None)
    )
    assert got == ref


def test_flow_exact_topk_truncates():
    lg = local_from_pandas(
        sd.planted_communities_pd(
            n=150, m_background=200, blocks=[(10, 1.0), (8, 1.0), (7, 1.0)], seed=81
        )
    ).with_cliques(3)
    assert len(flow_exact_lhcds(lg, k=2)) == 2
    assert len(flow_exact_lhcds(lg, k=None)) >= 3


def test_greedy_outputs_disjoint():
    lg = local_from_pandas(
        sd.team_graph_pd(n=120, n_teams=20, team_size=(4, 6), seed=82)
    ).with_cliques(3)
    seen = set()
    for r in greedy_topk_cds(lg, k=5):
        assert not (set(r.vertices) & seen)
        seen |= set(r.vertices)


def test_greedy_first_is_globally_densest_region():
    # the top-1 LhCDS is the h-clique densest subgraph; greedy's first
    # output must match its density (both are exact on a clean instance)
    lg = local_from_pandas(
        sd.planted_communities_pd(n=120, m_background=150, blocks=[(11, 1.0)], seed=83)
    ).with_cliques(3)
    g = greedy_topk_cds(lg, k=1, T=60)
    assert g[0].density == Fraction(lg.instance_count(range(11)), 11)


def test_greedy_density_matches_reported_sets():
    lg = _random_graph(3).with_cliques(3)
    for r in greedy_topk_cds(lg, k=3):
        assert r.density == Fraction(lg.instance_count(r.vertices), r.size)


def test_greedy_no_locality_guarantee_documented():
    """Greedy may return subgraphs overlapping a dense region's periphery;
    IPPV never does (Proposition 2). This is the Fig-14 phenomenon."""
    from repro.core.ippv import ippv_local

    lg = local_from_pandas(
        sd.team_graph_pd(n=200, n_teams=35, team_size=(4, 6), overlap=0.25, seed=84)
    ).with_cliques(3)
    greedy_sizes = [r.size for r in greedy_topk_cds(lg, k=3)]
    ippv_sizes = [r.size for r in ippv_local(lg, k=3)]
    assert greedy_sizes and ippv_sizes  # both produce output on this graph
