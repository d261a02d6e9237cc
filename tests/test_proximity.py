"""Distributed eps-proximity graph vs brute-force all-pairs."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest

from repro.geo import pairwise_haversine_np
from repro.hac.proximity import eps_edges


def _brute(pdf, eps):
    d = pairwise_haversine_np(pdf.lat.to_numpy(), pdf.lon.to_numpy())
    ids = pdf.location_id.to_numpy()
    out = set()
    n = len(pdf)
    for i in range(n):
        for j in range(i + 1, n):
            if d[i, j] <= eps:
                a, b = int(ids[i]), int(ids[j])
                out.add((min(a, b), max(a, b)))
    return out


@pytest.mark.parametrize("seed,eps", [(0, 100.0), (1, 100.0), (2, 60.0), (3, 250.0)])
def test_eps_edges_match_brute_force(spark, seed, eps):
    rng = np.random.default_rng(seed)
    n = 200
    pdf = pd.DataFrame(
        {
            "location_id": rng.permutation(np.arange(1, n + 1)),
            "lat": rng.uniform(53.33, 53.345, n),
            "lon": rng.uniform(-6.28, -6.255, n),
        }
    )
    got = {
        (int(r["src"]), int(r["dst"]))
        for r in eps_edges(spark.createDataFrame(pdf), eps_m=eps).collect()
    }
    assert got == _brute(pdf, eps)


def test_eps_edges_distances_are_exact(spark):
    pdf = pd.DataFrame(
        {"location_id": [1, 2], "lat": [53.3000, 53.3004], "lon": [-6.26, -6.26]}
    )
    rows = eps_edges(spark.createDataFrame(pdf), eps_m=100.0).collect()
    assert len(rows) == 1
    # 0.0004 deg lat = ~44.5 m
    assert rows[0]["dist_m"] == pytest.approx(44.48, abs=0.1)


def test_eps_edges_no_self_pairs(spark):
    pdf = pd.DataFrame({"location_id": [1, 2, 3], "lat": [53.3] * 3, "lon": [-6.26] * 3})
    rows = eps_edges(spark.createDataFrame(pdf), eps_m=100.0).collect()
    assert all(r["src"] < r["dst"] for r in rows)
    assert len(rows) == 3  # all coincident pairs, each once
