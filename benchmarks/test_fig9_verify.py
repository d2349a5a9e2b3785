"""Benchmark: paper Figure 9/10 — IPPV with basic vs fast verification.

The paper's headline ablation: the fast verifier's size-reduced flow
networks vs the basic full-graph networks, across h and k.
"""
import pytest

from repro.core.ippv import ippv_local
from repro.experiments import load_local

CASES = [("HA-lite", 3), ("HA-lite", 4), ("HA-lite", 5), ("CM-lite", 3), ("CM-lite", 5)]


@pytest.mark.parametrize("name,h", CASES, ids=[f"{n}-h{h}" for n, h in CASES])
@pytest.mark.parametrize("k", [5, 20])
@pytest.mark.parametrize("verifier", ["fast", "basic"])
def test_fig9_verifier(benchmark, name, h, k, verifier):
    lg = load_local(name, h)
    benchmark.group = f"fig9 {name} h={h} k={k}"
    st = {}
    res = benchmark.pedantic(
        lambda: ippv_local(lg, k=k, fast_verify=(verifier == "fast"), stats=st),
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["found"] = len(res)
    benchmark.extra_info["verify_calls"] = st.get("verify_fast", 0) + st.get(
        "verify_basic", 0
    )
