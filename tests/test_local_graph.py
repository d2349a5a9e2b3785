"""LocalGraph: the driver-side mirror's own invariants."""
from fractions import Fraction
from itertools import combinations

import pytest

from repro import synth_data as sd
from repro.graphs.local import LocalGraph, local_from_pandas


@pytest.fixture(scope="module")
def lg():
    return local_from_pandas(sd.er_graph_pd(n=30, m=90, seed=41))


def test_canonicalization():
    g = LocalGraph(edges=[(2, 1), (1, 2), (3, 3), (1, 4)])
    assert g.edges == [(1, 2), (1, 4)]


def test_enumerate_cliques_vs_bruteforce(lg):
    for h in (3, 4):
        ref = {
            tuple(sorted(c))
            for c in combinations(lg.vertices, h)
            if all(lg.has_edge(a, b) for a, b in combinations(c, 2))
        }
        assert set(lg.enumerate_cliques(h)) == ref


def test_instance_count_and_density(lg):
    g = lg.with_cliques(3)
    s = set(list(g.vertices)[:12])
    ref = sum(1 for t in g.instances if s.issuperset(t))
    assert g.instance_count(s) == ref
    assert g.density(s) == ref / len(s)


def test_components_partition(lg):
    comps = lg.components()
    assert sorted(v for c in comps for v in c) == sorted(lg.vertices)
    flat = [v for c in comps for v in c]
    assert len(flat) == len(set(flat))


def test_components_no_cross_edges(lg):
    comps = lg.components()
    cid = {v: i for i, c in enumerate(comps) for v in c}
    for u, v in lg.edges:
        assert cid[u] == cid[v]


def test_induced_subgraph(lg):
    g = lg.with_cliques(3)
    s = set(list(g.vertices)[:15])
    sub = g.induced(s)
    assert all(u in s and v in s for u, v in sub.edges)
    assert sorted(sub.instances) == sorted(g.instances_within(s))


def test_edge_density_of_clique():
    g = local_from_pandas(sd.clique_pd(list(range(5))))
    assert g.edge_density(set(range(5))) == 1.0


def test_diameter_path():
    g = LocalGraph(edges=[(0, 1), (1, 2), (2, 3)])
    assert g.diameter({0, 1, 2, 3}) == 3
    assert g.diameter({0, 1}) == 1


def test_clustering_triangle_plus_pendant():
    g = LocalGraph(edges=[(0, 1), (1, 2), (0, 2), (2, 3)])
    assert g.clustering(0) == 1.0
    assert g.clustering(2) == pytest.approx(1 / 3)
    assert g.clustering(3) == 0.0


def test_density_empty_set(lg):
    assert lg.with_cliques(3).density(set()) == 0.0


def test_touching_incidence(lg):
    g = lg.with_cliques(3)
    if g.instances:
        v = g.instances[0][0]
        assert all(v in g.instances[i] for i in g.inc[v])
