"""Table III benchmark: Algorithm 1 (ranking + selection + reassignment)
and the selected-graph split by old/new stations."""
from __future__ import annotations

from repro.stations.selection import select_stations
from repro.tables import PAPER, table3


def test_bench_table3_selection(benchmark, spark, bench_pipeline, bench_sf):
    r = bench_pipeline

    def run():
        sel = select_stations(
            r.candidates.groups, r.candidate_trips,
            r.cleaned.locations, r.candidates.assignment,
        )
        return sel.n_selected

    n_selected = benchmark.pedantic(run, rounds=1, iterations=1)
    assert n_selected == r.selection.n_selected
    pdf = table3(r)
    print(f"\n[table3] paper: {PAPER['table3']} | measured (sf={bench_sf}):")
    print(pdf.to_string(index=False))
