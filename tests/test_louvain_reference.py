"""The pure-Python reference Louvain: modularity identities and known
partitions on hand-checkable graphs."""
from __future__ import annotations

import itertools

import numpy as np
import pytest

from repro.louvain.reference import louvain_ref, modularity_ref

TWO_TRIANGLES = [
    (0, 1, 1.0), (1, 2, 1.0), (0, 2, 1.0),
    (3, 4, 1.0), (4, 5, 1.0), (3, 5, 1.0),
    (2, 3, 0.5),
]


def test_modularity_single_community_is_zero_minus_null():
    # all nodes in one community: Q = sum_in/2m - (2m/2m)^2 = 1 - 1 = 0
    comm = {u: 0 for u in range(6)}
    assert modularity_ref(TWO_TRIANGLES, comm) == pytest.approx(0.0, abs=1e-12)


def test_modularity_hand_computed_two_triangles():
    # communities = the two triangles; m = 6.5
    # sigma_in = 6 each side (3 edges * 2), sigma_tot = 6.5 each
    comm = {0: 0, 1: 0, 2: 0, 3: 1, 4: 1, 5: 1}
    m = 6.5
    expected = 2 * (6 / (2 * m) - (6.5 / (2 * m)) ** 2)
    assert modularity_ref(TWO_TRIANGLES, comm) == pytest.approx(expected)
    assert expected == pytest.approx(0.42307692, abs=1e-6)


def test_modularity_self_loop_convention():
    # single node with self loop: Q = 2w/2m - (2w/2m)^2 with m=w -> 1-1=0
    edges = [(0, 0, 3.0)]
    assert modularity_ref(edges, {0: 0}) == pytest.approx(0.0)
    # two nodes, one edge + one loop: hand computed
    edges = [(0, 1, 1.0), (1, 1, 2.0)]
    # m=3; k0=1, k1=1+4=5
    comm = {0: 0, 1: 1}
    expected = (0 / 6 - (1 / 6) ** 2) + (4 / 6 - (5 / 6) ** 2)
    assert modularity_ref(edges, comm) == pytest.approx(expected)


def test_louvain_finds_triangles():
    comm = louvain_ref(TWO_TRIANGLES)
    assert len(set(comm.values())) == 2
    assert comm[0] == comm[1] == comm[2]
    assert comm[3] == comm[4] == comm[5]


def test_louvain_labels_are_dense_and_stable():
    comm = louvain_ref(TWO_TRIANGLES)
    assert set(comm.values()) == {0, 1}
    assert comm[0] == 0  # first sorted node determines label 0


@pytest.mark.parametrize("seed,blocks,n_per", [(0, 3, 8), (1, 4, 7), (2, 2, 12)])
def test_louvain_recovers_planted_partition(seed, blocks, n_per):
    rng = np.random.default_rng(seed)
    nodes = list(range(blocks * n_per))
    block = {u: u // n_per for u in nodes}
    edges = [
        (u, v, 1.0)
        for u, v in itertools.combinations(nodes, 2)
        if rng.random() < (0.8 if block[u] == block[v] else 0.03)
    ]
    comm = louvain_ref(edges)
    assert len(set(comm.values())) == blocks
    for u, v in itertools.combinations(nodes, 2):
        if block[u] == block[v]:
            assert comm[u] == comm[v]


def test_louvain_modularity_nonnegative_vs_singletons():
    """Louvain's partition must beat (or match) the all-singletons Q."""
    rng = np.random.default_rng(3)
    nodes = list(range(20))
    edges = [
        (u, v, float(rng.integers(1, 4)))
        for u, v in itertools.combinations(nodes, 2)
        if rng.random() < 0.2
    ]
    comm = louvain_ref(edges)
    q = modularity_ref(edges, comm)
    q_singletons = modularity_ref(edges, {u: u for u in nodes})
    assert q >= q_singletons - 1e-12


def test_louvain_deterministic():
    rng = np.random.default_rng(4)
    edges = [
        (int(u), int(v), float(w))
        for u, v, w in zip(rng.integers(0, 30, 120), rng.integers(0, 30, 120), rng.random(120) + 0.1)
    ]
    assert louvain_ref(edges) == louvain_ref(edges)
