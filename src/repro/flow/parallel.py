"""Per-partition parallel verification of many LhCDS candidates.

The fast verifier's reduced DeriveCompact problems are independent and
small — ideal per-partition work. ``verify_many`` runs Algorithm 5's BFS
reduction on the driver (cheap, needs the global bound state), ships the
undecided reduced flow problems to Spark executors one-per-partition, and
solves each with the exact integer Dinic there. Results are identical to
calling ``repro.core.verify.verify_fast`` per candidate; the tests assert
exactly that.

This is deliberately an RDD-level map: each element is one complete flow
problem (a Python object, Fractions included), not tabular data — there
is no Catalyst-shaped work in solving a max-flow.
"""
from __future__ import annotations

from fractions import Fraction

from pyspark.sql import SparkSession

from ..core.verify import _is_component, reduce_candidate
from ..graphs.local import LocalGraph
from .networks import derive_compact


def _solve(spec):
    cid, verts, inner, boundary, rho_eff, p = spec
    M = derive_compact(verts, inner, p, rho_eff, boundary)
    return cid, sorted(M)


def verify_many(
    spark: SparkSession,
    lg: LocalGraph,
    candidates: list[set[int]],
    ub: dict[int, float],
    lb: dict[int, float],
    out_exact: dict[int, Fraction] | None = None,
) -> list[bool]:
    """Verify each candidate (connected, self-densest) — True iff LhCDS."""
    out_exact = out_exact or {}
    reduced = [reduce_candidate(lg, S, ub, lb, out_exact) for S in candidates]
    specs = [
        (i, sorted(r[1]), r[2], r[3], r[4], lg.p)
        for i, r in enumerate(reduced)
        if r[0] == "flow"
    ]
    solved: dict[int, set[int]] = {}
    if specs:
        rdd = spark.sparkContext.parallelize(specs, len(specs))
        solved = {cid: set(m) for cid, m in rdd.map(_solve).collect()}
    out = []
    for i, (S, r) in enumerate(zip(candidates, reduced)):
        if r[0] == "decided":
            out.append(r[1])
        else:
            out.append(_is_component(lg, S, solved[i]))
    return out
