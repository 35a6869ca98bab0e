"""Figures 15-18 & 20: DTLP construction cost vs z and vs graph size.

Paper shape: build time first decreases then increases with z (fewer
subgraphs vs longer bounding paths per subgraph); build time grows
roughly linearly with graph size.
"""
import time

from repro.distrib import build_dtlp_spark
from repro.roadnet import grid_road_network


def test_build_cost_vs_z(benchmark, spark, get_graph, record):
    g = get_graph("NY")
    rows = []

    def run():
        rows.clear()
        for z in (25, 50, 80, 120):
            t0 = time.perf_counter()
            dtlp, _ = build_dtlp_spark(spark, g, z=z, xi=8)
            rows.append(
                (z, f"{time.perf_counter() - t0:.1f}", dtlp.ep.n_entries,
                 dtlp.skeleton.n_vertices)
            )
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "build_vs_z.md",
        ["z (NY)", "build_s", "ep_entries", "|G_lambda|"],
        rows,
    )


def test_build_cost_vs_graph_size(benchmark, spark, record):
    """Figure 20 (left axis): near-linear build cost in graph size."""
    sizes = [(30, 30), (42, 42), (60, 60)]
    rows = []

    def run():
        rows.clear()
        for r, c in sizes:
            g = grid_road_network(r, c, seed=7)
            t0 = time.perf_counter()
            build_dtlp_spark(spark, g, z=50, xi=8)
            rows.append((g.n_vertices, g.n_edges, f"{time.perf_counter() - t0:.1f}"))
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record("build_vs_size.md", ["#vertices", "#edges", "build_s"], rows)
