"""Latent spatiotemporal structure of the synthetic Moby Bikes network.

The paper's analysis discovers (a) three spatial macro-communities
(southside / suburbs / centre-north, Table IV), (b) seven day-of-week
communities (Table V: weekday-commuter vs weekend-leisure splits), and
(c) ten hour-of-day communities (Table VI: AM/PM commute, midday and
evening leisure). The generator plants exactly that hierarchy:

    3 zones  ->  7 day-groups  ->  10 leaf (hour) groups

Every node (fixed station or virtual hotspot) belongs to one leaf group;
trips preferentially connect nodes of the same leaf, then the same
day-group, then the same zone. Trip timestamps are drawn from the group
profiles below, so temporal edge weighting can reveal progressively finer
structure — the paper's central qualitative finding.

All distributions are module-level constants so tests can assert against
them and the generator stays deterministic.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

ZONES = ("south", "suburb", "centre")

# Day-of-week distributions (Mon..Sun). Commuter groups concentrate on
# Mon-Thu (low day-codes), weekend groups on Sat/Sun (high codes); trips
# *between* day-groups use the neutral weekday profile, so temporal
# weighting gives weekend communities high internal weight but low
# boundary weight — that is what lets G_Day split them out.
DAY_COMMUTE = np.array([0.22, 0.22, 0.22, 0.20, 0.10, 0.02, 0.02])
DAY_WEEKEND = np.array([0.05, 0.05, 0.05, 0.05, 0.10, 0.42, 0.28])
# Cross-group trips cluster at the start of the week (errands, one-off
# rides): their day-code mass is minimal, which keeps community-boundary
# edges light under the G_Day weighting.
DAY_NEUTRAL = np.array([0.45, 0.35, 0.15, 0.05, 0.00, 0.00, 0.00])


def _hour_peak(peaks: list[tuple[float, float, float]]) -> np.ndarray:
    """Mixture of discretised Gaussians over hours 0..23; peaks are
    (mean_hour, sigma, mix_weight)."""
    hours = np.arange(24, dtype=float)
    pdf = np.zeros(24)
    for mu, sigma, w in peaks:
        pdf += w * np.exp(-0.5 * ((hours - mu) / sigma) ** 2)
    return pdf / pdf.sum()


HOUR_AM = _hour_peak([(8.5, 0.8, 1.0)])
HOUR_PM = _hour_peak([(18.0, 0.9, 1.0)])
HOUR_MIDDAY = _hour_peak([(13.5, 1.2, 1.0)])
HOUR_EVENING = _hour_peak([(21.0, 0.9, 1.0)])
HOUR_MIXED = _hour_peak([(8.5, 0.8, 0.5), (18.5, 0.9, 0.5)])
# Cross-leaf trips happen early (low hour-codes): boundary edges stay light
# under hour weighting.
HOUR_NEUTRAL = _hour_peak([(3.5, 0.8, 1.0)])


@dataclass(frozen=True)
class LeafGroup:
    """One leaf of the latent hierarchy: an hour-profile community."""

    leaf_id: int
    name: str
    zone: str
    day_group: int  # 0..6
    day_dist: np.ndarray = field(repr=False)
    hour_dist: np.ndarray = field(repr=False)
    anchor: tuple[float, float]  # (lat, lon) spatial anchor
    spread_m: float  # gaussian sd of node placement around the anchor
    n_stations: int  # fixed stations planted in this leaf (sums to 92)
    station_mass: float  # share of station endpoint mass
    n_hotspots_frac: float  # share of hotspot count
    hotspot_mass: float  # share of hotspot endpoint mass


# Anchors are real Dublin landmarks rounded to ~100 m: city centre and
# northside, the south inner city, Phoenix Park, Dun Laoghaire / Blackrock
# and outer suburbs — mirroring the geography called out in the paper.
LEAF_GROUPS: tuple[LeafGroup, ...] = (
    # --- centre/north zone: commuters (D0) + weekend (D1) --------------
    LeafGroup(0, "centre-am", "centre", 0, DAY_COMMUTE, HOUR_AM,
              (53.3510, -6.2620), 700.0, 17, 0.20, 0.09, 0.09),
    LeafGroup(1, "centre-pm", "centre", 0, DAY_COMMUTE, HOUR_PM,
              (53.3575, -6.2450), 700.0, 17, 0.20, 0.09, 0.09),
    LeafGroup(2, "centre-weekend", "centre", 1, DAY_WEEKEND, HOUR_MIDDAY,
              (53.3650, -6.2820), 700.0, 12, 0.12, 0.09, 0.09),
    # --- southside zone: commuters (D2) + weekend (D3) ------------------
    LeafGroup(3, "south-am", "south", 2, DAY_COMMUTE, HOUR_AM,
              (53.3230, -6.2520), 700.0, 14, 0.15, 0.09, 0.09),
    LeafGroup(4, "south-pm", "south", 2, DAY_COMMUTE, HOUR_PM,
              (53.3300, -6.2330), 700.0, 14, 0.15, 0.08, 0.08),
    LeafGroup(5, "south-weekend", "south", 3, DAY_WEEKEND, HOUR_MIDDAY,
              (53.3120, -6.2230), 700.0, 12, 0.12, 0.10, 0.10),
    # --- suburb zone: commuters (D4), park weekend (D5), coast weekend (D6)
    LeafGroup(6, "suburb-commute", "suburb", 4, DAY_COMMUTE, HOUR_MIXED,
              (53.3900, -6.3000), 1800.0, 2, 0.02, 0.11, 0.11),
    LeafGroup(7, "suburb-park", "suburb", 5, DAY_WEEKEND, HOUR_MIDDAY,
              (53.3560, -6.3300), 1000.0, 1, 0.01, 0.13, 0.13),
    LeafGroup(8, "suburb-coast-day", "suburb", 6, DAY_WEEKEND, HOUR_MIDDAY,
              (53.3000, -6.1450), 600.0, 2, 0.02, 0.11, 0.11),
    LeafGroup(9, "suburb-coast-eve", "suburb", 6, DAY_WEEKEND, HOUR_EVENING,
              (53.2760, -6.1150), 600.0, 1, 0.01, 0.11, 0.11),
)

N_DAY_GROUPS = 7
N_LEAVES = len(LEAF_GROUPS)

assert sum(g.n_stations for g in LEAF_GROUPS) == 92
assert abs(sum(g.station_mass for g in LEAF_GROUPS) - 1.0) < 1e-9
assert abs(sum(g.n_hotspots_frac for g in LEAF_GROUPS) - 1.0) < 1e-9
assert abs(sum(g.hotspot_mass for g in LEAF_GROUPS) - 1.0) < 1e-9
assert {g.day_group for g in LEAF_GROUPS} == set(range(N_DAY_GROUPS))
assert {g.zone for g in LEAF_GROUPS} == set(ZONES)
