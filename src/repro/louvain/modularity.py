"""Exact modularity (paper eq. 2) over DataFrames.

Input is the *symmetric* edge representation from
:meth:`repro.graph.graph.Graph.symmetrize`: every undirected non-loop edge
appears in both directions, every self-loop once. With that convention

    m           = sum(non-loop w)/2 + sum(loop w)
    k_i         = sum(non-loop w at i) + 2 * loop_w(i)
    Sigma_in_c  = sum of symmetric non-loop intra-community w + 2*loop w
    Sigma_tot_c = sum of k_i over i in c
    Q           = sum_c [ Sigma_in_c/(2m) - (Sigma_tot_c/(2m))^2 ]
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.graph import DST, SRC, WEIGHT, Graph


def _edge_with_communities(sym_edges: DataFrame, assignment: DataFrame) -> DataFrame:
    """Tag each symmetric edge with both endpoints' communities."""
    a_src = assignment.select(F.col("id").alias(SRC), F.col("community").alias("c_src"))
    a_dst = assignment.select(F.col("id").alias(DST), F.col("community").alias("c_dst"))
    # per-vertex state is small relative to edges — broadcast it
    return sym_edges.join(F.broadcast(a_src), SRC).join(F.broadcast(a_dst), DST)


def modularity(g: Graph, assignment: DataFrame) -> float:
    """Modularity Q of ``assignment`` (columns ``id``, ``community``) on the
    symmetric graph ``g``. Computed in two small aggregations; the final
    per-community frame is collapsed with one more aggregate so only a
    scalar reaches the driver."""
    e = _edge_with_communities(g.edges.select(SRC, DST, WEIGHT), assignment)
    is_loop = F.col(SRC) == F.col(DST)

    totals = e.agg(
        (
            F.sum(F.when(~is_loop, F.col(WEIGHT)).otherwise(0.0)) / 2.0
            + F.sum(F.when(is_loop, F.col(WEIGHT)).otherwise(0.0))
        ).alias("m")
    ).collect()[0]
    m = float(totals["m"] or 0.0)
    if m == 0.0:
        return 0.0

    # Per-endpoint degree contributions: non-loop edge contributes w to the
    # src side; loops contribute 2w. On the symmetric frame, grouping by src
    # alone covers every endpoint exactly once for non-loops (since each
    # undirected edge appears in both directions) — loops appear once, so
    # weight them twice.
    k = e.groupBy(SRC, "c_src").agg(
        F.sum(F.when(is_loop, 2.0 * F.col(WEIGHT)).otherwise(F.col(WEIGHT))).alias("k")
    )
    # Vertices with no edges have k=0 and affect neither term.
    sigma_tot = k.groupBy(F.col("c_src").alias("community")).agg(F.sum("k").alias("tot"))

    sigma_in = (
        e.filter(F.col("c_src") == F.col("c_dst"))
        .groupBy(F.col("c_src").alias("community"))
        .agg(
            F.sum(
                F.when(is_loop, 2.0 * F.col(WEIGHT)).otherwise(F.col(WEIGHT))
            ).alias("inn")
        )
    )

    per_c = sigma_tot.join(sigma_in, "community", "left").fillna({"inn": 0.0})
    q = per_c.agg(
        F.sum(
            F.col("inn") / F.lit(2.0 * m) - (F.col("tot") / F.lit(2.0 * m)) ** 2
        ).alias("q")
    ).collect()[0]["q"]
    return float(q or 0.0)
