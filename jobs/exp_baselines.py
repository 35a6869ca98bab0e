"""Baseline comparison job (Figures 35-41 experiments).

    spark-submit jobs/exp_baselines.py --dataset NY --nq 8 --k 2
"""
import random
import sys
import time

sys.path.insert(0, __file__.rsplit("/", 2)[0] + "/jobs")
from _common import base_parser, get_spark, print_table  # noqa: E402

from repro.baselines import CANDS, find_ksp
from repro.core import yen_ksp
from repro.distrib import build_dtlp_spark, process_batch_spark
from repro.roadnet import DATASETS, apply_deltas, load_dataset, snapshot_deltas


def main() -> None:
    p = base_parser(__doc__)
    p.add_argument("--nq", type=int, default=8)
    p.add_argument("--k", type=int, default=2)
    args = p.parse_args()
    z = args.z or DATASETS[args.dataset].default_z

    spark = get_spark("exp_baselines")
    g = load_dataset(args.dataset)
    apply_deltas(g, snapshot_deltas(g, alpha=args.alpha, tau=args.tau, seed=args.seed))
    dtlp, _ = build_dtlp_spark(spark, g, z=z, xi=args.xi)

    rnd = random.Random(args.seed)
    verts = sorted(g.vertices)
    queries = [tuple(rnd.sample(verts, 2)) for _ in range(args.nq)]

    t0 = time.perf_counter()
    process_batch_spark(spark, dtlp, queries, args.k)
    t_dg = time.perf_counter() - t0

    t0 = time.perf_counter()
    for s, t in queries:
        find_ksp(g.neighbors, s, t, args.k)
    t_fk = time.perf_counter() - t0

    t0 = time.perf_counter()
    for s, t in queries:
        yen_ksp(g.neighbors, s, t, args.k)
    t_yen = time.perf_counter() - t0

    t0 = time.perf_counter()
    cands = CANDS(g, dtlp.partition)
    for s, t in queries:
        cands.shortest_path(s, t)
    t_cands = time.perf_counter() - t0

    print_table(
        ["dataset", "N_q", "k", "KSP-DG (s)", "FindKSP (s)", "Yen (s)", "CANDS k=1 (s, incl. build)"],
        [
            (
                args.dataset,
                args.nq,
                args.k,
                f"{t_dg:.1f}",
                f"{t_fk:.1f}",
                f"{t_yen:.1f}",
                f"{t_cands:.1f}",
            )
        ],
    )
    spark.stop()


if __name__ == "__main__":
    main()
