"""Spark connected components vs the driver mirror."""
import pandas as pd
import pytest

from repro import synth_data as sd
from repro.graphs import edgelist as el
from repro.graphs.components import connected_components
from repro.graphs.local import local_from_pandas

CASES = {
    "er": lambda: sd.er_graph_pd(n=60, m=80, seed=101),  # sparse -> many comps
    "team": lambda: sd.team_graph_pd(n=100, n_teams=12, team_size=(3, 5), overlap=0.0, seed=102),
    "web": lambda: sd.web_graph_pd(n=80, extra=10, seed=103),
}


@pytest.mark.parametrize("name", sorted(CASES))
def test_components_match_local(spark, name):
    pdf = CASES[name]()
    lg = local_from_pandas(pdf)
    labels = connected_components(el.edges_from_pandas(spark, pdf))
    got = {}
    for r in labels.collect():
        got.setdefault(r["comp"], set()).add(r["v"])
    ref = {frozenset(c) for c in lg.components() if len(c) > 1 or lg.adj[next(iter(c))]}
    assert {frozenset(c) for c in got.values()} == ref


def test_component_label_is_min_vertex(spark):
    pdf = pd.DataFrame({"src": [5, 7, 1], "dst": [6, 5, 2]})
    labels = connected_components(el.edges_from_pandas(spark, pdf))
    lab = {r["v"]: r["comp"] for r in labels.collect()}
    assert lab[5] == lab[6] == lab[7] == 5
    assert lab[1] == lab[2] == 1


def test_single_edge(spark):
    pdf = pd.DataFrame({"src": [0], "dst": [1]})
    labels = connected_components(el.edges_from_pandas(spark, pdf))
    assert {(r["v"], r["comp"]) for r in labels.collect()} == {(0, 0), (1, 0)}
