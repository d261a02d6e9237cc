"""Distributed Louvain + DataFrame modularity vs the Python reference."""
from __future__ import annotations

import itertools

import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.graph.graph import Graph, graph_from_edges
from repro.louvain.louvain import index_vertices, louvain
from repro.louvain.modularity import modularity
from repro.louvain.reference import louvain_ref, modularity_ref


def _spark_graph(spark, edges):
    df = spark.createDataFrame(
        [(int(u), int(v), float(w)) for u, v, w in edges],
        "src long, dst long, weight double",
    )
    return graph_from_edges(df).symmetrize()


CASES = {
    "two_triangles": [
        (0, 1, 1.0), (1, 2, 1.0), (0, 2, 1.0),
        (3, 4, 1.0), (4, 5, 1.0), (3, 5, 1.0), (2, 3, 0.5),
    ],
    "loops_and_weights": [
        (0, 1, 3.0), (1, 2, 2.0), (0, 0, 5.0), (2, 3, 0.3),
        (3, 4, 2.0), (4, 5, 2.5), (5, 3, 1.0), (5, 5, 1.0),
    ],
}


def _planted(seed, blocks, n_per, p_in=0.7, p_out=0.05):
    rng = np.random.default_rng(seed)
    nodes = list(range(blocks * n_per))
    return [
        (u, v, 1.0)
        for u, v in itertools.combinations(nodes, 2)
        if rng.random() < (p_in if u // n_per == v // n_per else p_out)
    ]


CASES["planted_3x8"] = _planted(0, 3, 8)


@pytest.mark.parametrize("name", sorted(CASES))
def test_spark_louvain_matches_reference_quality(spark, name):
    """Same #communities and same modularity as the reference (both find
    an optimum of the same greedy family on these graphs)."""
    edges = CASES[name]
    ref = louvain_ref(edges)
    q_ref = modularity_ref(edges, ref)
    res = louvain(_spark_graph(spark, edges))
    assign = {r["id"]: r["community"] for r in res.assignment.collect()}
    assert len(set(assign.values())) == len(set(ref.values()))
    assert res.modularity == pytest.approx(q_ref, abs=1e-6)
    # the reported modularity must equal the recomputed (reference) Q of
    # the returned assignment — no drift between claim and partition
    assert modularity_ref(edges, assign) == pytest.approx(res.modularity, abs=1e-9)


@pytest.mark.parametrize("name", sorted(CASES))
def test_spark_modularity_matches_reference(spark, name):
    """DataFrame modularity of an arbitrary partition == reference."""
    edges = CASES[name]
    g = _spark_graph(spark, edges)
    nodes = sorted({u for e in edges for u in e[:2]})
    # arbitrary 2-coloring partition
    part = {u: u % 2 for u in nodes}
    assign = spark.createDataFrame(list(part.items()), "id long, community long")
    assert modularity(g, assign) == pytest.approx(modularity_ref(edges, part), abs=1e-9)


def test_spark_modularity_singletons(spark):
    edges = CASES["two_triangles"]
    g = _spark_graph(spark, edges)
    nodes = sorted({u for e in edges for u in e[:2]})
    part = {u: u for u in nodes}
    assign = spark.createDataFrame(list(part.items()), "id long, community long")
    assert modularity(g, assign) == pytest.approx(modularity_ref(edges, part), abs=1e-9)


def test_louvain_isolated_vertices_stay_singleton(spark):
    e = spark.createDataFrame(
        [(0, 1, 1.0), (1, 2, 1.0), (0, 2, 1.0)], "src long, dst long, weight double"
    )
    v = spark.createDataFrame([(i,) for i in range(5)], "id long")
    res = louvain(Graph(v, e).symmetrize())
    assign = {r["id"]: r["community"] for r in res.assignment.collect()}
    assert len(assign) == 5
    assert assign[0] == assign[1] == assign[2]
    assert len({assign[3], assign[4], assign[0]}) == 3


def test_louvain_assignment_labels_dense(spark):
    res = louvain(_spark_graph(spark, CASES["two_triangles"]))
    labels = sorted({r["community"] for r in res.assignment.collect()})
    assert labels == list(range(len(labels)))


def test_index_vertices_dense_and_sorted(spark):
    v = spark.createDataFrame([("b",), ("a",), ("c",), ("a",)], "id string")
    idx = {r["id"]: r["idx"] for r in index_vertices(v).collect()}
    assert idx == {"a": 0, "b": 1, "c": 2}
