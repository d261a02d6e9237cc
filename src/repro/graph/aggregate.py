"""GraphX-style ``aggregateMessages`` on DataFrames.

The primitive behind Pregel-like algorithms: every edge may send a message
to its source and/or destination vertex; messages are combined per vertex
with an aggregate expression. Because we stay in the DataFrame API the
whole exchange is one union + one hash aggregation in Catalyst.
"""
from __future__ import annotations

from typing import Callable

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.graph.graph import DST, SRC, Graph


def aggregate_messages(
    g: Graph,
    *,
    to_dst: Callable[[DataFrame], Column] | None = None,
    to_src: Callable[[DataFrame], Column] | None = None,
    agg: Callable[[Column], Column] = F.sum,
    msg_col: str = "msg",
) -> DataFrame:
    """Send a message along every edge and aggregate per receiving vertex.

    ``to_dst(edges)``/``to_src(edges)`` build the message Column from the
    (possibly vertex-attribute-joined) edge DataFrame; at least one must be
    given. ``agg`` combines messages per vertex (default sum). Returns
    ``(id, msg)`` for every vertex that received at least one message.
    """
    if to_dst is None and to_src is None:
        raise ValueError("at least one of to_dst/to_src is required")
    e = g.edges
    parts = []
    if to_dst is not None:
        parts.append(e.select(F.col(DST).alias("id"), to_dst(e).alias("__m")))
    if to_src is not None:
        parts.append(e.select(F.col(SRC).alias("id"), to_src(e).alias("__m")))
    msgs = parts[0]
    for p in parts[1:]:
        msgs = msgs.unionByName(p)
    return msgs.groupBy("id").agg(agg(F.col("__m")).alias(msg_col))


def triplets(g: Graph, *, src_prefix: str = "src_", dst_prefix: str = "dst_") -> DataFrame:
    """Edge rows joined with both endpoint vertex attribute rows
    (GraphX's triplet view). Vertex columns other than ``id`` are prefixed."""
    sv = g.vertices
    attrs = [c for c in sv.columns if c != "id"]
    src_v = sv.select(F.col("id").alias(SRC), *[F.col(c).alias(src_prefix + c) for c in attrs])
    dst_v = sv.select(F.col("id").alias(DST), *[F.col(c).alias(dst_prefix + c) for c in attrs])
    return g.edges.join(src_v, SRC).join(dst_v, DST)
