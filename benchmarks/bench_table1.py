"""Table 1: statistics of the road-network datasets under DTLP.

Paper row format: #vertices, #edges, z, #subgraphs (n_b > 5), |G_lambda|.
Ours adds the distributed build time.  Scale is ~100-700x below the
paper's (DESIGN.md section 2); the *shape* to check is: subgraph count
~ |V|/z with a long tail of small pieces, skeleton an order of magnitude
smaller than G, and counts ordered NY < COL < FLA < CUSA.
"""
import time

from repro.roadnet import DATASETS


def test_table1_dataset_statistics(benchmark, spark, get_graph, record):
    from repro.distrib import build_dtlp_spark

    rows = []

    def run():
        rows.clear()
        for name, spec in DATASETS.items():
            g = get_graph(name)
            t0 = time.perf_counter()
            dtlp, _ = build_dtlp_spark(spark, g, z=spec.default_z, xi=8)
            dt = time.perf_counter() - t0
            s = dtlp.stats()
            rows.append(
                (
                    name,
                    s["n_vertices"],
                    s["n_edges"],
                    s["z"],
                    f"{s['n_subgraphs']} ({s['n_subgraphs_nb_gt5']})",
                    s["skeleton_vertices"],
                    f"{dt:.1f}",
                )
            )
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "table1.md",
        ["dataset", "#vertices", "#edges", "z", "#subgraphs (nb>5)", "|G_lambda|", "build_s"],
        rows,
    )
