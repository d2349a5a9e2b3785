"""The brute-force oracle itself, on hand-constructed graphs."""
from fractions import Fraction

import pandas as pd
import pytest

from repro import synth_data as sd
from repro.core.bruteforce import _Masks, brute_compact_numbers, brute_lhcds
from repro.graphs.local import LocalGraph, local_from_pandas


def _k(n, offset=0):
    return sd.clique_pd([offset + i for i in range(n)])


def test_single_triangle():
    lg = local_from_pandas(_k(3)).with_cliques(3)
    phi = brute_compact_numbers(lg)
    assert phi == {0: Fraction(1, 3), 1: Fraction(1, 3), 2: Fraction(1, 3)}
    assert brute_lhcds(lg) == [({0, 1, 2}, Fraction(1, 3))]


def test_k5_h3():
    lg = local_from_pandas(_k(5)).with_cliques(3)
    # K5: C(5,3)=10 triangles over 5 vertices -> density 2
    assert brute_lhcds(lg) == [({0, 1, 2, 3, 4}, Fraction(2))]


def test_two_disjoint_cliques():
    pdf = pd.concat([_k(5), _k(4, offset=10)])
    lg = local_from_pandas(pdf).with_cliques(3)
    res = [(s, d) for s, d in brute_lhcds(lg) if d > 0]
    assert res == [
        ({0, 1, 2, 3, 4}, Fraction(2)),
        ({10, 11, 12, 13}, Fraction(1)),
    ]


def test_bridged_equal_cliques_merge():
    """Two K4s joined by one edge: the union is 1-compact and connected,
    so the individual K4s are NOT LhCDSes — only the union is."""
    pdf = pd.concat([_k(4), _k(4, offset=4), pd.DataFrame({"src": [3], "dst": [4]})])
    lg = local_from_pandas(pdf).with_cliques(3)
    res = [(s, d) for s, d in brute_lhcds(lg) if d > 0]
    assert res == [(set(range(8)), Fraction(1))]


def test_bridge_to_denser_clique_destroys_smaller():
    """K5 -- K4 bridged: the K4 is chained into the K5's 1-compact region,
    so only the K5 (at its own higher level) is an LhCDS."""
    pdf = pd.concat([_k(5), _k(4, offset=5), pd.DataFrame({"src": [4], "dst": [5]})])
    lg = local_from_pandas(pdf).with_cliques(3)
    res = [(s, d) for s, d in brute_lhcds(lg) if d > 0]
    assert res == [({0, 1, 2, 3, 4}, Fraction(2))]


def test_compact_numbers_of_figure2_style_graph():
    """Proposition 1: compactness <= density; Theorem 1 linkage."""
    pdf = pd.concat([_k(5), _k(4, offset=10)])
    lg = local_from_pandas(pdf).with_cliques(4)
    phi = brute_compact_numbers(lg)
    # K5 has C(5,4)=5 4-cliques -> density 1; K4 has 1 -> density 1/4
    for v in range(5):
        assert phi[v] == Fraction(1)
    for v in range(10, 14):
        assert phi[v] == Fraction(1, 4)


def test_masks_rejects_large_graphs():
    lg = local_from_pandas(sd.er_graph_pd(n=40, m=100, seed=1)).with_cliques(3)
    with pytest.raises(ValueError):
        _Masks(lg)


def test_masks_requires_instances():
    with pytest.raises(ValueError):
        _Masks(LocalGraph(edges=[(0, 1)]))


def test_h2_compactness_is_lds():
    """h=2 reduces to Qin et al.'s rho-compactness over edges."""
    lg = local_from_pandas(_k(4)).with_cliques(2)
    # K4: 6 edges / 4 vertices -> density 1.5, and K4 is 1.5-compact
    assert brute_lhcds(lg) == [({0, 1, 2, 3}, Fraction(3, 2))]
