"""Table 3: number of vertices in the skeleton graph G_lambda vs z.

The skeleton's vertex set is exactly the boundary-vertex set of the
partition, so this sweep needs only partitioning.  Paper shape: |G_lambda|
decreases monotonically as z grows, for every dataset.
"""
from repro.core import bfs_partition
from repro.roadnet import load_dataset

#: z sweeps scaled ~4x down from the paper's (NY/COL: 100..300,
#: FLA: 350..550, CUSA: 800..1200).
Z_SWEEP = {
    "NY": [25, 35, 50, 65, 80],
    "COL": [25, 35, 50, 65, 80],
    "FLA": [50, 65, 80, 100, 120],
    "CUSA": [65, 80, 100, 120, 150],
}


def test_table3_skeleton_size_vs_z(benchmark, record):
    graphs = {name: load_dataset(name) for name in Z_SWEEP}
    rows = []

    def run():
        rows.clear()
        for name, zs in Z_SWEEP.items():
            sizes = [len(bfs_partition(graphs[name], z).boundary) for z in zs]
            rows.append([name] + [f"z={z}: {n}" for z, n in zip(zs, sizes)])
            assert sizes == sorted(sizes, reverse=True), (
                f"{name}: skeleton must shrink as z grows, got {sizes}"
            )
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "table3.md",
        ["dataset", "z_1", "z_2", "z_3", "z_4", "z_5"],
        rows,
    )
