"""Connected components vs a pure-Python union-find reference."""
from __future__ import annotations

import numpy as np
import pytest

from repro.graph.components import connected_components
from repro.graph.graph import Graph, graph_from_edges


def _union_find(n, edges):
    parent = list(range(n))

    def find(x):
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for u, v in edges:
        ru, rv = find(u), find(v)
        if ru != rv:
            parent[max(ru, rv)] = min(ru, rv)
    # canonical label = min member id
    labels = {}
    for x in range(n):
        r = find(x)
        labels.setdefault(r, min(i for i in range(n) if find(i) == r))
    return {x: labels[find(x)] for x in range(n)}


@pytest.mark.parametrize("seed,n,p", [(0, 30, 0.05), (1, 40, 0.02), (2, 25, 0.15)])
def test_components_match_union_find(spark, seed, n, p):
    rng = np.random.default_rng(seed)
    edges = [
        (int(i), int(j))
        for i in range(n)
        for j in range(i + 1, n)
        if rng.random() < p
    ]
    v = spark.createDataFrame([(i,) for i in range(n)], "id long")
    e = spark.createDataFrame(
        [(u, w, 1.0) for u, w in edges] or [(0, 0, 1.0)],
        "src long, dst long, weight double",
    )
    got = {r["id"]: r["component"] for r in connected_components(Graph(v, e)).collect()}
    assert got == _union_find(n, edges)


def test_components_singletons(spark):
    v = spark.createDataFrame([(i,) for i in range(5)], "id long")
    e = spark.createDataFrame([(0, 0, 1.0)], "src long, dst long, weight double")
    got = {r["id"]: r["component"] for r in connected_components(Graph(v, e)).collect()}
    assert got == {i: i for i in range(5)}


def test_components_chain_and_direction_ignored(spark):
    # directed chain 4 -> 3 -> 2 -> 1 -> 0 must still collapse to one comp
    e = spark.createDataFrame(
        [(i + 1, i, 1.0) for i in range(4)], "src long, dst long, weight double"
    )
    g = graph_from_edges(e)
    got = {r["id"]: r["component"] for r in connected_components(g).collect()}
    assert set(got.values()) == {0}


def test_components_max_iter_raises(spark):
    e = spark.createDataFrame(
        [(i + 1, i, 1.0) for i in range(6)], "src long, dst long, weight double"
    )
    g = graph_from_edges(e)
    with pytest.raises(RuntimeError, match="converge"):
        connected_components(g, max_iter=1)
