"""Induced 4-vertex pattern enumeration vs a combinatorial brute force."""
from itertools import combinations

import pytest
from pyspark.sql import functions as F

from repro import synth_data as sd
from repro.graphs import edgelist as el
from repro.graphs import patterns as pt
from repro.graphs.local import local_from_pandas
from repro.oracle import assert_equivalent


def brute_patterns(lg):
    """Classify every connected induced 4-subgraph by brute force."""
    out = {name: set() for name in pt.PATTERNS_4}
    for quad in combinations(lg.vertices, 4):
        es = [(a, b) for a, b in combinations(quad, 2) if lg.has_edge(a, b)]
        if not lg.is_connected(set(quad)):
            continue
        deg = {v: 0 for v in quad}
        for a, b in es:
            deg[a] += 1
            deg[b] += 1
        ne, md = len(es), max(deg.values())
        for name, (ne_ref, md_ref) in pt.PATTERNS_4.items():
            if (ne, md) == (ne_ref, md_ref):
                out[name].add(tuple(sorted(quad)))
    return out


GRAPHS = {
    "er": lambda: sd.er_graph_pd(n=28, m=80, seed=21),
    "team": lambda: sd.team_graph_pd(n=40, n_teams=8, team_size=(3, 5), seed=22),
    "web": lambda: sd.web_graph_pd(n=40, extra=15, seed=23),
}


@pytest.fixture(scope="module", params=sorted(GRAPHS))
def case(request, spark):
    pdf = GRAPHS[request.param]()
    lg = local_from_pandas(pdf)
    edges = el.edges_from_pandas(spark, pdf)
    wide = pt.classify_4sets(edges).collect()
    got = {name: set() for name in pt.PATTERNS_4}
    for r in wide:
        got[r["pattern"]].add((r["s1"], r["s2"], r["s3"], r["s4"]))
    return lg, edges, got, brute_patterns(lg)


@pytest.mark.parametrize("pattern", sorted(pt.PATTERNS_4))
def test_pattern_classification(case, pattern):
    _lg, _edges, got, ref = case
    assert got[pattern] == ref[pattern]


def test_total_connected_4sets(case):
    lg, edges, got, ref = case
    assert sum(len(s) for s in got.values()) == sum(len(s) for s in ref.values())


@pytest.mark.parametrize("pattern", ["clique4", "diamond", "cycle4"])
def test_pattern_instances_long_format(spark, pattern):
    pdf = GRAPHS["team"]()
    inst = pt.pattern_instances(el.edges_from_pandas(spark, pdf), pattern)
    per = inst.groupBy("iid").agg(F.count("*").alias("c")).select("c").distinct().collect()
    assert [r["c"] for r in per] in ([], [4])


def test_pattern_instances_unknown_name(spark):
    pdf = GRAPHS["er"]()
    with pytest.raises(ValueError):
        pt.pattern_instances(el.edges_from_pandas(spark, pdf), "pentagon")


def test_paper_label_map_is_total():
    assert sorted(pt.PAPER_LABELS.values()) == sorted(pt.PATTERNS_4)


def test_clique4_matches_clique_enumerator(spark):
    from repro.graphs import cliques as cq

    pdf = GRAPHS["team"]()
    edges = el.edges_from_pandas(spark, pdf)
    via_pat = cq.instances_to_local(pt.pattern_instances(edges, "clique4"))
    via_cli = cq.instances_to_local(cq.clique_instances(edges, 4))
    assert sorted(via_pat) == sorted(via_cli)


def test_wedge_count_vs_duckdb(spark):
    """Connected 3-sets = wedge closures; oracle-check the wedge count."""
    pdf = GRAPHS["er"]()
    edges = el.edges_from_pandas(spark, pdf)
    adj = pt._adjacency(edges)
    w1 = adj.select(F.col("u").alias("c"), F.col("w").alias("x"))
    w2 = adj.select(F.col("u").alias("c"), F.col("w").alias("y"))
    wedges = w1.join(w2, "c").filter(F.col("x") < F.col("y"))
    got = wedges.agg(F.count("*").alias("n_wedges"))
    assert_equivalent(
        got,
        """WITH adj AS (SELECT src AS u, dst AS w FROM e
                        UNION ALL SELECT dst, src FROM e)
           SELECT count(*) AS n_wedges
           FROM adj a JOIN adj b ON a.u = b.u AND a.w < b.w""",
        e=pdf,
    )
