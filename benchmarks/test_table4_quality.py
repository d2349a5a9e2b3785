"""Benchmark: paper Table 4 — edge density / diameter of top-5 LhCDSes
across h. The quality numbers land in extra_info; EXPERIMENTS.md diffs
them against the paper's Table 4."""
import pytest

from repro.core.ippv import ippv_local
from repro.experiments import load_local
from repro.metrics import average_metrics

NAMES = ["HA-lite", "PP-lite", "PC-lite", "GQ-lite", "CM-lite", "WB-lite"]


@pytest.mark.parametrize("name", NAMES)
@pytest.mark.parametrize("h", [2, 3, 5, 7, 9])
def test_table4_quality(benchmark, name, h):
    lg_plain = load_local(name)
    lg = lg_plain.with_cliques(h)
    benchmark.group = f"table4 {name}"
    if not lg.instances:
        pytest.skip(f"no {h}-cliques in {name} (paper marks such cells OOM/—)")

    res = benchmark.pedantic(lambda: ippv_local(lg, k=5), rounds=1, iterations=1)
    mets = average_metrics(lg_plain, [set(r.vertices) for r in res])
    benchmark.extra_info.update(
        {
            "h": h,
            "count": mets["count"],
            "edge_density": None if mets["edge_density"] is None else round(mets["edge_density"], 3),
            "diameter": None if mets["diameter"] is None else round(mets["diameter"], 2),
        }
    )
    if mets["count"]:
        assert 0 <= mets["edge_density"] <= 1
