"""Benchmark: paper Table 2 — dataset statistics via the Spark enumerator.

One benchmark per (dataset, h): time to enumerate and count h-cliques.
The counted values (the actual Table-2 cells) land in ``extra_info`` and
in EXPERIMENTS.md.
"""
import pytest

from repro.experiments import DATASETS, load_spark
from repro.graphs import cliques as cq
from repro.graphs import edgelist as el


@pytest.mark.parametrize("name", list(DATASETS))
@pytest.mark.parametrize("h", [3, 5])
def test_table2_clique_count(benchmark, spark, name, h):
    edges = load_spark(spark, name).localCheckpoint(eager=True)
    benchmark.group = f"table2 h={h}"

    def count():
        return cq.count_instances(cq.clique_instances(edges, h))

    psi = benchmark.pedantic(count, rounds=1, iterations=1)
    benchmark.extra_info["dataset"] = name
    benchmark.extra_info[f"|Psi{h}|"] = psi
    benchmark.extra_info["|V|"] = el.vertices(edges).count()
    benchmark.extra_info["|E|"] = edges.count()
    assert psi >= 0
