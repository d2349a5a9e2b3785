"""Connected components on DataFrames via iterative min-label propagation.

Used by the Spark layer when candidate subgraphs are still large; tiny
subgraphs (verification neighborhoods) use ``LocalGraph.components``.
Each round every vertex adopts the minimum label in its closed
neighborhood; rounds are iterated to fixpoint with ``localCheckpoint``
truncating lineage. Label count per round halves at worst-case O(log n)
geometric rate on typical graphs.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .edgelist import vertices as vertices_of


def connected_components(edges: DataFrame, max_rounds: int = 64) -> DataFrame:
    """Label vertices with their component id as DF ``(v, comp)``.

    ``comp`` is the minimum vertex id of the component.
    """
    labels = vertices_of(edges).withColumn("comp", F.col("v")).localCheckpoint(eager=True)
    adj = edges.select(F.col("src").alias("v"), F.col("dst").alias("w")).unionByName(
        edges.select(F.col("dst").alias("v"), F.col("src").alias("w"))
    ).localCheckpoint(eager=True)
    for _ in range(max_rounds):
        nbr_min = (
            adj.join(labels.withColumnRenamed("v", "w").withColumnRenamed("comp", "wc"), "w")
            .groupBy("v")
            .agg(F.min("wc").alias("nc"))
        )
        new = labels.join(nbr_min, "v", "left").select(
            "v", F.least("comp", F.coalesce("nc", "comp")).alias("comp")
        )
        changed = (
            new.withColumnRenamed("comp", "nc2")
            .join(labels, "v")
            .filter(F.col("nc2") != F.col("comp"))
            .count()
        )
        labels = new.localCheckpoint(eager=True)
        if changed == 0:
            break
    return labels
