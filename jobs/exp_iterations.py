"""Iteration-count job (Figures 24-27 experiments).

    spark-submit jobs/exp_iterations.py --dataset NY --k 8
"""
import random
import statistics
import sys

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import base_parser, get_spark, print_table  # noqa: E402

from repro.core import ksp_dg
from repro.distrib import build_dtlp_spark
from repro.roadnet import DATASETS, apply_deltas, load_dataset, snapshot_deltas


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--nq", type=int, default=8)
    p.add_argument("--k", type=int, default=8)
    args = p.parse_args()
    z = args.z or DATASETS[args.dataset].default_z

    spark = get_spark("exp_iterations")
    g = load_dataset(args.dataset)
    apply_deltas(g, snapshot_deltas(g, alpha=args.alpha, tau=args.tau, seed=args.seed))
    dtlp, _ = build_dtlp_spark(spark, g, z=z, xi=args.xi)

    rnd = random.Random(args.seed)
    verts = sorted(g.vertices)
    queries = [tuple(rnd.sample(verts, 2)) for _ in range(args.nq)]
    iters = [ksp_dg(dtlp, s, t, args.k).n_iterations for s, t in queries]
    print_table(
        ["dataset", "xi", "alpha", "tau", "k", "mean_iters", "max_iters"],
        [
            (
                args.dataset,
                args.xi,
                f"{args.alpha:.0%}",
                f"{args.tau:.0%}",
                args.k,
                f"{statistics.mean(iters):.1f}",
                max(iters),
            )
        ],
    )
    spark.stop()


if __name__ == "__main__":
    main()
