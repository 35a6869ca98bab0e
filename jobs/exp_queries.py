"""Batch KSP query job (Figures 28-34 experiments).

    spark-submit jobs/exp_queries.py --dataset NY --nq 32 --k 2
"""
import random
import sys
import time

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import base_parser, get_spark, print_table  # noqa: E402

from repro.distrib import build_dtlp_spark, process_batch_spark
from repro.roadnet import DATASETS, apply_deltas, load_dataset, snapshot_deltas


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--nq", type=int, default=32, help="batch size")
    p.add_argument("--k", type=int, default=2)
    args = p.parse_args()
    z = args.z or DATASETS[args.dataset].default_z

    spark = get_spark("exp_queries")
    g = load_dataset(args.dataset)
    apply_deltas(g, snapshot_deltas(g, alpha=args.alpha, tau=args.tau, seed=args.seed))
    t0 = time.perf_counter()
    dtlp, _ = build_dtlp_spark(spark, g, z=z, xi=args.xi)
    build_s = time.perf_counter() - t0

    rnd = random.Random(args.seed)
    verts = sorted(g.vertices)
    queries = [tuple(rnd.sample(verts, 2)) for _ in range(args.nq)]
    t0 = time.perf_counter()
    results = process_batch_spark(spark, dtlp, queries, args.k)
    batch_s = time.perf_counter() - t0

    iters = [results[q].n_iterations for q in results]
    print_table(
        ["dataset", "z", "xi", "N_q", "k", "build_s", "batch_s", "mean_iters"],
        [
            (
                args.dataset,
                z,
                args.xi,
                args.nq,
                args.k,
                f"{build_s:.1f}",
                f"{batch_s:.1f}",
                f"{sum(iters) / len(iters):.1f}",
            )
        ],
    )
    spark.stop()


if __name__ == "__main__":
    main()
