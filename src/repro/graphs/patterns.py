"""Induced 4-vertex pattern enumeration on DataFrames (paper section 5).

The paper's Figure 8 lists the six connected patterns on four vertices
(4a..4f). We enumerate **induced** occurrences (standard in the motif
literature): every connected induced 4-vertex subgraph is classified by
its edge count and maximum degree, which uniquely identifies the pattern:

===========  =====  ========  ==============================
name         edges  max deg   paper label (Figure 8 order)
===========  =====  ========  ==============================
``star4``      3       3      4a (K1,3, the 3-star)
``path4``      3       2      4b (P4)
``paw``        4       3      4c (triangle + pendant edge)
``cycle4``     4       2      4d (C4)
``diamond``    5       3      4e (K4 minus an edge)
``clique4``    6       3      4f (K4)
===========  =====  ========  ==============================

Enumeration: connected 3-sets are exactly the wedge closures (a triangle
contributes three wedges that dedupe to one sorted set); every connected
4-set extends a connected 3-set by one neighbor, so one adjacency join plus
a distinct over the sorted member tuple covers all of them exactly once.
Classification then probes the six possible member pairs against the edge
table. Instances are emitted in the same long ``(iid, v)`` format as
h-cliques, so the generic IPPV core consumes them unchanged.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

PATTERNS_4: dict[str, tuple[int, int]] = {
    "star4": (3, 3),
    "path4": (3, 2),
    "paw": (4, 3),
    "cycle4": (4, 2),
    "diamond": (5, 3),
    "clique4": (6, 3),
}

#: paper Figure 8 label -> our pattern name
PAPER_LABELS = {
    "4a": "star4", "4b": "path4", "4c": "paw",
    "4d": "cycle4", "4e": "diamond", "4f": "clique4",
}


def _adjacency(edges: DataFrame) -> DataFrame:
    return edges.select(F.col("src").alias("u"), F.col("dst").alias("w")).unionByName(
        edges.select(F.col("dst").alias("u"), F.col("src").alias("w"))
    )


def connected_4sets(edges: DataFrame) -> DataFrame:
    """All vertex 4-sets inducing a connected subgraph, as ``s1<s2<s3<s4``."""
    adj = _adjacency(edges).localCheckpoint(eager=True)
    w1 = adj.select(F.col("u").alias("c"), F.col("w").alias("x"))
    w2 = adj.select(F.col("u").alias("c"), F.col("w").alias("y"))
    wedges = w1.join(w2, "c").filter(F.col("x") < F.col("y"))
    tri3 = wedges.select(
        F.array_sort(F.array("c", "x", "y")).alias("s")
    ).distinct()
    ext = tri3.join(
        adj.withColumnRenamed("u", "member").withColumnRenamed("w", "z"),
        F.array_contains(F.col("s"), F.col("member")),
    ).filter(~F.array_contains(F.col("s"), F.col("z")))
    sets4 = ext.select(
        F.array_sort(F.concat(F.col("s"), F.array(F.col("z")))).alias("s")
    ).distinct()
    return sets4.select(*[F.col("s")[i].alias(f"s{i+1}") for i in range(4)])


def classify_4sets(edges: DataFrame) -> DataFrame:
    """Connected 4-sets with their induced pattern name in column ``pattern``."""
    sets4 = connected_4sets(edges)
    pairs = [(1, 2), (1, 3), (1, 4), (2, 3), (2, 4), (3, 4)]
    cur = sets4
    for i, j in pairs:
        e = edges.select(
            F.col("src").alias(f"s{i}"),
            F.col("dst").alias(f"s{j}"),
            F.lit(1).alias(f"e{i}{j}"),
        )
        cur = cur.join(e, [f"s{i}", f"s{j}"], "left")
    ecols = [F.coalesce(F.col(f"e{i}{j}"), F.lit(0)) for i, j in pairs]
    cur = cur.withColumn("ne", sum(ecols, F.lit(0)))
    degs = []
    for v in range(1, 5):
        inc = [
            F.coalesce(F.col(f"e{min(v,o)}{max(v,o)}"), F.lit(0))
            for o in range(1, 5)
            if o != v
        ]
        degs.append(sum(inc, F.lit(0)))
    cur = cur.withColumn("maxdeg", F.greatest(*degs))
    label = (
        F.when((F.col("ne") == 3) & (F.col("maxdeg") == 3), "star4")
        .when((F.col("ne") == 3) & (F.col("maxdeg") == 2), "path4")
        .when((F.col("ne") == 4) & (F.col("maxdeg") == 3), "paw")
        .when((F.col("ne") == 4) & (F.col("maxdeg") == 2), "cycle4")
        .when(F.col("ne") == 5, "diamond")
        .otherwise("clique4")
    )
    return cur.select("s1", "s2", "s3", "s4", label.alias("pattern"))


def pattern_instances(edges: DataFrame, pattern: str) -> DataFrame:
    """Induced occurrences of ``pattern`` in long ``(iid, v)`` format."""
    if pattern not in PATTERNS_4:
        raise ValueError(f"unknown pattern {pattern!r}; one of {sorted(PATTERNS_4)}")
    wide = classify_4sets(edges).filter(F.col("pattern") == pattern)
    cols = ["s1", "s2", "s3", "s4"]
    w = Window.orderBy(*cols)
    wide = wide.withColumn("iid", F.row_number().over(w) - F.lit(1))
    stacked = None
    for c in cols:
        part = wide.select("iid", F.col(c).alias("v"))
        stacked = part if stacked is None else stacked.unionByName(part)
    return stacked
