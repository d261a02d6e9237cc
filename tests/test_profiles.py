"""The planted spatiotemporal hierarchy: distribution and structural
invariants the generator and the calibration rely on."""
from __future__ import annotations

import numpy as np
import pytest

from repro.moby import profiles as P


@pytest.mark.parametrize(
    "dist",
    [P.DAY_COMMUTE, P.DAY_WEEKEND, P.DAY_NEUTRAL],
    ids=["commute", "weekend", "neutral"],
)
def test_day_distributions_normalised(dist):
    assert dist.shape == (7,)
    assert dist.sum() == pytest.approx(1.0)
    assert (dist >= 0).all()


@pytest.mark.parametrize(
    "dist",
    [P.HOUR_AM, P.HOUR_PM, P.HOUR_MIDDAY, P.HOUR_EVENING, P.HOUR_MIXED, P.HOUR_NEUTRAL],
    ids=["am", "pm", "midday", "evening", "mixed", "neutral"],
)
def test_hour_distributions_normalised(dist):
    assert dist.shape == (24,)
    assert dist.sum() == pytest.approx(1.0)
    assert (dist >= 0).all()


def test_commute_weekend_contrast():
    """Weekend groups must carry much higher mean day-codes than commute
    groups, and the neutral profile lower than both — the mechanism that
    lets G_Day split weekend communities out."""
    codes = np.arange(1, 8)
    mean = lambda d: float((d * codes).sum())
    assert mean(P.DAY_WEEKEND) > mean(P.DAY_COMMUTE) + 2.5
    assert mean(P.DAY_NEUTRAL) < mean(P.DAY_COMMUTE)


def test_hour_profile_ordering():
    codes = np.arange(1, 25)
    mean = lambda d: float((d * codes).sum())
    assert mean(P.HOUR_NEUTRAL) < mean(P.HOUR_AM) < mean(P.HOUR_MIDDAY) < mean(P.HOUR_PM)
    assert mean(P.HOUR_EVENING) > mean(P.HOUR_PM)


def test_hour_peaks_located():
    assert int(np.argmax(P.HOUR_AM)) in (8, 9)
    assert int(np.argmax(P.HOUR_PM)) == 18
    assert int(np.argmax(P.HOUR_MIDDAY)) in (13, 14)
    assert int(np.argmax(P.HOUR_EVENING)) == 21


def test_hierarchy_shape():
    assert P.N_LEAVES == 10
    assert P.N_DAY_GROUPS == 7
    assert len(P.ZONES) == 3
    # zones partition day-groups; day-groups partition leaves
    dg_zone = {}
    for g in P.LEAF_GROUPS:
        dg_zone.setdefault(g.day_group, set()).add(g.zone)
    assert all(len(z) == 1 for z in dg_zone.values())


def test_station_totals():
    assert sum(g.n_stations for g in P.LEAF_GROUPS) == 92


def test_anchor_coordinates_in_dublin():
    from repro.moby.generator import DUBLIN_BBOX, SEA_LON_MIN

    lat_min, lat_max, lon_min, lon_max = DUBLIN_BBOX
    for g in P.LEAF_GROUPS:
        lat, lon = g.anchor
        assert lat_min < lat < lat_max
        assert lon_min < lon < SEA_LON_MIN  # strictly west of the bay
