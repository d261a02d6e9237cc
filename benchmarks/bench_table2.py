"""Table II benchmark: HAC candidate construction (eps-graph, connected
components, exact complete linkage) + candidate-graph statistics."""
from __future__ import annotations

from repro.graph.builder import graph_stats, trips_with_groups
from repro.hac.cluster import build_candidates
from repro.tables import PAPER


def test_bench_table2_hac_candidates(benchmark, spark, bench_cleaned, bench_sf):
    def run():
        cand = build_candidates(bench_cleaned.locations, bench_cleaned.stations)
        trips = trips_with_groups(bench_cleaned.rentals, cand.assignment)
        return graph_stats(trips)

    stats = benchmark.pedantic(run, rounds=1, iterations=1)
    assert stats.n_trips == bench_cleaned.clean_rentals
    assert stats.directed_edges >= stats.undirected_edges
    print(
        f"\n[table2] paper: {PAPER['table2']} | measured (sf={bench_sf}): "
        f"nodes={stats.n_nodes} und={stats.undirected_edges} "
        f"und_nl={stats.undirected_edges_no_loops} dir={stats.directed_edges} "
        f"dir_nl={stats.directed_edges_no_loops} trips={stats.n_trips}"
    )
