"""Table I benchmark: the six cleaning rules over the raw Rental +
Location tables, and the paper-vs-measured comparison."""
from __future__ import annotations

from repro.moby.cleaning import clean
from repro.tables import PAPER


def test_bench_table1_cleaning(benchmark, spark, bench_data):
    def run():
        res = clean(bench_data.locations, bench_data.rentals)
        return res.clean_rentals, res.clean_locations, res.clean_stations

    rentals, locations, stations = benchmark.pedantic(run, rounds=3, iterations=1)
    cfg = bench_data.config
    # Table I deltas are exact by construction at every scale factor
    assert stations == 92
    assert rentals == cfg.n_rentals
    assert locations == cfg.n_locations
    print(
        f"\n[table1] paper clean: {PAPER['table1']['clean']} | "
        f"measured (sf-scaled): stations={stations} rentals={rentals} locations={locations}"
    )
