"""Connected components via iterative min-label message passing.

The HAC stage (and, in tests, the Louvain validation) needs connected
components of the 100 m proximity graph. This is the classic Pregel
formulation: every vertex starts labelled with its own id; each round every
vertex adopts the minimum label among itself and its neighbours; stop when
no label changes. Rounds = O(component diameter), which for geographic
eps-graphs is small.

Labels propagate in both edge directions, so the input may be directed —
components are computed on the underlying undirected graph.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.graph import DST, SRC, Graph


def connected_components(g: Graph, *, max_iter: int = 50) -> DataFrame:
    """Return ``(id, component)`` where ``component`` is the minimum vertex
    id in the component. Raises if not converged within ``max_iter``."""
    labels = g.vertices.select("id", F.col("id").alias("component")).localCheckpoint()
    edges = (
        g.edges.select(SRC, DST)
        .filter(F.col(SRC) != F.col(DST))
        .distinct()
        .cache()
    )
    for _ in range(max_iter):
        # candidate label for dst = label(src), and vice versa
        lsrc = labels.select(F.col("id").alias(SRC), F.col("component").alias("__l"))
        ldst = labels.select(F.col("id").alias(DST), F.col("component").alias("__l"))
        incoming = (
            edges.join(lsrc, SRC).select(F.col(DST).alias("id"), "__l")
            .unionByName(edges.join(ldst, DST).select(F.col(SRC).alias("id"), "__l"))
            .groupBy("id")
            .agg(F.min("__l").alias("__nbr_min"))
        )
        new_labels = (
            labels.join(incoming, "id", "left")
            .select(
                "id",
                F.least(
                    F.col("component"), F.coalesce(F.col("__nbr_min"), F.col("component"))
                ).alias("component"),
            )
            .localCheckpoint()  # cut lineage each round
        )
        changed = (
            new_labels.alias("n")
            .join(labels.alias("o"), "id")
            .filter(F.col("n.component") != F.col("o.component"))
            .limit(1)
            .count()
        )
        labels = new_labels
        if changed == 0:
            edges.unpersist()
            return labels
    edges.unpersist()
    raise RuntimeError(f"connected_components did not converge in {max_iter} iterations")
