"""DTLP build + maintenance cost job (Figures 15-23 experiments).

    spark-submit jobs/exp_build_maintenance.py --dataset NY --z 50 --xi 8
"""
import sys
import time

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import base_parser, get_spark, print_table  # noqa: E402

from repro.distrib import build_dtlp_spark
from repro.roadnet import DATASETS, load_dataset, snapshot_deltas


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--rounds", type=int, default=3, help="update batches")
    args = p.parse_args()
    z = args.z or DATASETS[args.dataset].default_z

    spark = get_spark("exp_build_maintenance")
    g = load_dataset(args.dataset)
    t0 = time.perf_counter()
    dtlp, _ = build_dtlp_spark(spark, g, z=z, xi=args.xi)
    build_s = time.perf_counter() - t0

    rows = []
    for i in range(args.rounds):
        deltas = snapshot_deltas(g, alpha=args.alpha, tau=args.tau, seed=args.seed + i)
        t0 = time.perf_counter()
        stats = dtlp.update(deltas)
        rows.append(
            (
                i,
                f"{(time.perf_counter() - t0) * 1e3:.0f}",
                stats.n_deltas,
                stats.n_paths_touched,
                stats.n_skeleton_edges_updated,
            )
        )
    print(f"build: {build_s:.1f}s, ep_entries={dtlp.ep.n_entries}")
    print_table(
        ["batch", "update_ms", "n_deltas", "paths_touched", "skeleton_edges_updated"],
        rows,
    )
    spark.stop()


if __name__ == "__main__":
    main()
