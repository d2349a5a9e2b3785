"""Benchmark: paper Table 5 — average clustering coefficient of the
detected LhCDSes across h."""
import pytest

from repro.core.ippv import ippv_local
from repro.experiments import load_local
from repro.metrics import average_metrics

NAMES = ["HA-lite", "PP-lite", "PC-lite", "CM-lite", "EP-lite"]


@pytest.mark.parametrize("name", NAMES)
@pytest.mark.parametrize("h", [2, 3, 5, 7, 9])
def test_table5_clustering(benchmark, name, h):
    lg_plain = load_local(name)
    lg = lg_plain.with_cliques(h)
    benchmark.group = f"table5 {name}"
    if not lg.instances:
        pytest.skip(f"no {h}-cliques in {name} (paper marks such cells OOM/—)")

    res = benchmark.pedantic(lambda: ippv_local(lg, k=5), rounds=1, iterations=1)
    mets = average_metrics(lg_plain, [set(r.vertices) for r in res])
    benchmark.extra_info.update(
        {
            "h": h,
            "count": mets["count"],
            "avg_clustering": None
            if mets["avg_clustering"] is None
            else round(mets["avg_clustering"], 3),
        }
    )
    if mets["count"]:
        assert 0 <= mets["avg_clustering"] <= 1
