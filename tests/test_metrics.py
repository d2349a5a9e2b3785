"""Quality metrics used by Tables 4/5."""
import pandas as pd
import pytest

from repro import synth_data as sd
from repro.graphs.local import LocalGraph, local_from_pandas
from repro.metrics import average_metrics, subgraph_metrics


def test_clique_metrics():
    lg = local_from_pandas(sd.clique_pd(list(range(6))))
    m = subgraph_metrics(lg, set(range(6)))
    assert m == {"size": 6, "edge_density": 1.0, "diameter": 1, "avg_clustering": 1.0}


def test_path_metrics():
    lg = LocalGraph(edges=[(0, 1), (1, 2), (2, 3)])
    m = subgraph_metrics(lg, {0, 1, 2, 3})
    assert m["diameter"] == 3
    assert m["edge_density"] == pytest.approx(0.5)
    assert m["avg_clustering"] == 0.0


def test_metrics_respect_induced_subgraph():
    # star + outside edges: clustering within the subgraph ignores outside
    lg = LocalGraph(edges=[(0, 1), (0, 2), (0, 3), (1, 2), (3, 9), (9, 1)])
    m = subgraph_metrics(lg, {0, 1, 2, 3})
    assert m["diameter"] == 2


def test_average_metrics():
    lg = local_from_pandas(pd.concat([sd.clique_pd([0, 1, 2]), sd.clique_pd([5, 6, 7, 8])]))
    avg = average_metrics(lg, [{0, 1, 2}, {5, 6, 7, 8}])
    assert avg["count"] == 2
    assert avg["edge_density"] == 1.0
    assert avg["diameter"] == 1.0


def test_average_metrics_empty():
    lg = LocalGraph(edges=[(0, 1)])
    assert average_metrics(lg, [])["count"] == 0
