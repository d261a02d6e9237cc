"""End-to-end HAC candidate construction on constructed geometries:
50 m pre-assignment, eps-component decomposition, exact per-component
complete linkage, centroid computation."""
from __future__ import annotations

import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.geo import haversine_np
from repro.hac.cluster import build_candidates

LAT0, LON0 = 53.34, -6.27
DEG_PER_M_LAT = 1 / 111_194.9


def _pt(dx_m, dy_m):
    return (
        LAT0 + dy_m * DEG_PER_M_LAT,
        LON0 + dx_m * DEG_PER_M_LAT / np.cos(np.radians(LAT0)),
    )


@pytest.fixture()
def scene(spark):
    """One station; one location 30 m from it (pre-assigned); a tight
    cloud of 3 points ~40 m across 500 m away (one candidate cluster);
    two points 150 m apart in the same eps-component? No — 150 m > 100 m
    so they are separate components and separate clusters."""
    station = _pt(0, 0)
    near_station = _pt(30, 0)
    cloud = [_pt(500, 0), _pt(520, 0), _pt(510, 25)]
    pair = [_pt(-600, 0), _pt(-750, 0)]
    pts = [near_station] + cloud + pair
    locations = spark.createDataFrame(
        pd.DataFrame(
            {
                "location_id": range(1, len(pts) + 1),
                "lat": [p[0] for p in pts],
                "lon": [p[1] for p in pts],
            }
        )
    )
    stations = spark.createDataFrame(
        pd.DataFrame({"station_id": [7], "lat": [station[0]], "lon": [station[1]]})
    )
    return locations, stations


def test_preassignment_and_clusters(scene):
    locations, stations = scene
    res = build_candidates(locations, stations)
    a = {r["location_id"]: (r["group_id"], r["kind"]) for r in res.assignment.collect()}
    assert a[1] == ("S7", "station")  # within 50 m of the station
    # the 3-point cloud is one candidate cluster
    assert a[2][1] == "candidate"
    assert a[2][0] == a[3][0] == a[4][0]
    # the 150 m pair are two distinct clusters
    assert a[5][0] != a[6][0]
    assert a[5][1] == a[6][1] == "candidate"
    # cloud cluster differs from pair clusters
    assert a[2][0] not in (a[5][0], a[6][0])


def test_every_location_assigned_exactly_once(scene):
    locations, stations = scene
    res = build_candidates(locations, stations)
    assert res.assignment.count() == locations.count()
    assert res.assignment.select("location_id").distinct().count() == locations.count()


def test_groups_table_contents(scene):
    locations, stations = scene
    res = build_candidates(locations, stations)
    groups = res.groups.collect()
    kinds = {r["group_id"]: r["kind"] for r in groups}
    assert kinds["S7"] == "station"
    assert sum(1 for k in kinds.values() if k == "candidate") == 3
    # station group keeps the station's own coordinate
    srow = [r for r in groups if r["group_id"] == "S7"][0]
    assert (srow["lat"], srow["lon"]) == pytest.approx((LAT0, LON0))
    assert srow["station_id"] == 7


def test_candidate_centroid_is_member_mean(scene, spark):
    locations, stations = scene
    res = build_candidates(locations, stations)
    a = {r["location_id"]: r["group_id"] for r in res.assignment.collect()}
    cloud_gid = a[2]
    loc_pdf = locations.toPandas().set_index("location_id")
    expected_lat = loc_pdf.loc[[2, 3, 4], "lat"].mean()
    expected_lon = loc_pdf.loc[[2, 3, 4], "lon"].mean()
    row = [r for r in res.groups.collect() if r["group_id"] == cloud_gid][0]
    assert row["lat"] == pytest.approx(expected_lat)
    assert row["lon"] == pytest.approx(expected_lon)


def test_cluster_diameter_rule_on_generated_data(spark, cleaned_small):
    """Paper Rule 1 on real generated data: no two members of any
    candidate cluster are more than 100 m apart."""
    from repro.hac.cluster import build_candidates

    res = build_candidates(cleaned_small.locations, cleaned_small.stations)
    pdf = (
        res.assignment.filter(F.col("kind") == "candidate")
        .join(cleaned_small.locations.select("location_id", "lat", "lon"), "location_id")
        .toPandas()
    )
    for gid, grp in pdf.groupby("group_id"):
        if len(grp) > 1:
            d = haversine_np(
                grp.lat.to_numpy()[:, None], grp.lon.to_numpy()[:, None],
                grp.lat.to_numpy()[None, :], grp.lon.to_numpy()[None, :],
            )
            assert d.max() <= 100.0 + 1e-6, gid


def test_preassign_rule_on_generated_data(spark, cleaned_small):
    """Every location within 50 m of a station is station-assigned, and
    every candidate-assigned location is > 50 m from all stations."""
    from repro.geo import nearest_station

    res = build_candidates(cleaned_small.locations, cleaned_small.stations)
    near = nearest_station(
        cleaned_small.locations.select("location_id", "lat", "lon"),
        cleaned_small.stations.select("station_id", "lat", "lon"),
        out_col="ns",
    ).select("location_id", "ns_dist_m")
    joined = res.assignment.join(near, "location_id").collect()
    for r in joined:
        if r["ns_dist_m"] <= 50.0:
            assert r["kind"] == "station"
        else:
            assert r["kind"] == "candidate"
