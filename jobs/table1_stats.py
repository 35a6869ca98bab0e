"""Table 1 job: dataset statistics under the distributed DTLP build.

    spark-submit jobs/table1_stats.py [--xi 8]
"""
import sys
import time

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import base_parser, get_spark, print_table  # noqa: E402

from repro.distrib import build_dtlp_spark
from repro.roadnet import DATASETS, apply_deltas, load_dataset, snapshot_deltas


def run(spark, xi: int, alpha: float, tau: float, seed: int):
    rows = []
    for name, spec in DATASETS.items():
        g = load_dataset(name)
        if alpha > 0:
            apply_deltas(g, snapshot_deltas(g, alpha=alpha, tau=tau, seed=seed))
        t0 = time.perf_counter()
        dtlp, _ = build_dtlp_spark(spark, g, z=spec.default_z, xi=xi)
        s = dtlp.stats()
        rows.append(
            (
                name,
                s["n_vertices"],
                s["n_edges"],
                s["z"],
                f"{s['n_subgraphs']} ({s['n_subgraphs_nb_gt5']})",
                s["skeleton_vertices"],
                f"{time.perf_counter() - t0:.1f}",
            )
        )
    return rows


def main() -> None:
    args = base_parser(__doc__).parse_args()
    spark = get_spark("table1")
    rows = run(spark, args.xi, args.alpha, args.tau, args.seed)
    print_table(
        ["dataset", "#vertices", "#edges", "z", "#subgraphs (nb>5)", "|G_lambda|", "build_s"],
        rows,
    )
    spark.stop()


if __name__ == "__main__":
    main()
