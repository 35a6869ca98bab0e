"""Table 3 job: skeleton-graph size |G_lambda| for a sweep of z.

    spark-submit jobs/table3_skeleton.py            # all datasets
    python jobs/table3_skeleton.py --dataset NY     # (no Spark needed)
"""
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import base_parser, print_table  # noqa: E402

from repro.core import bfs_partition
from repro.roadnet import load_dataset

Z_SWEEP = {
    "NY": [25, 35, 50, 65, 80],
    "COL": [25, 35, 50, 65, 80],
    "FLA": [50, 65, 80, 100, 120],
    "CUSA": [65, 80, 100, 120, 150],
}


def run(datasets):
    rows = []
    for name in datasets:
        g = load_dataset(name)
        cells = [
            f"z={z}: {len(bfs_partition(g, z).boundary)}" for z in Z_SWEEP[name]
        ]
        rows.append([name] + cells)
    return rows


def main() -> None:
    args = base_parser(__doc__).parse_args()
    datasets = [args.dataset] if args.dataset else list(Z_SWEEP)
    rows = run(datasets)
    print_table(["dataset", "z_1", "z_2", "z_3", "z_4", "z_5"], rows)


if __name__ == "__main__":
    main()
