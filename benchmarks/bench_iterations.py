"""Figures 24-27: number of KSP-DG iterations vs xi, tau, k, alpha.

Paper shapes: iterations fall sharply as xi grows (Fig 24); rise with
tau (Fig 25); rise with k (Fig 26); alpha's effect is dataset-dependent
but small at alpha < 30% (Fig 27).  The paper measures at k=50 on
graphs 100-700x larger; we use k=8 (and sweep k up to 16) at -lite
scale.
"""
import statistics

from repro.core import ksp_dg


#: wall-clock guard; pathological queries report 300 (a floor on the
#: true count — noted in EXPERIMENTS.md)
_ITER_CAP = 300


def _mean_iters(dtlp, queries, k):
    return statistics.mean(
        ksp_dg(dtlp, s, t, k, max_iterations=_ITER_CAP).n_iterations
        for s, t in queries
    )


def test_iterations_vs_xi(benchmark, get_dtlp, make_queries, record):
    rows = []

    def run():
        rows.clear()
        for xi in (4, 8, 12):
            dtlp = get_dtlp("NY", z=50, xi=xi)
            queries = make_queries(dtlp.graph, 8, seed=1)
            rows.append((xi, f"{_mean_iters(dtlp, queries, 8):.1f}"))
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record("iterations_vs_xi.md", ["xi (NY, k=8)", "mean_iterations"], rows)
    assert float(rows[0][1]) >= float(rows[-1][1]), "iterations must fall with xi"


def test_iterations_vs_tau(benchmark, get_dtlp, make_queries, record):
    rows = []

    def run():
        rows.clear()
        for tau in (0.1, 0.3, 0.5):
            dtlp = get_dtlp("NY", z=50, xi=12, tau=tau)
            queries = make_queries(dtlp.graph, 8, seed=2)
            rows.append((f"{tau:.0%}", f"{_mean_iters(dtlp, queries, 8):.1f}"))
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record("iterations_vs_tau.md", ["tau (NY, k=8)", "mean_iterations"], rows)


def test_iterations_vs_k(benchmark, get_dtlp, make_queries, record):
    dtlp = get_dtlp("NY", z=50, xi=12)
    rows = []

    def run():
        rows.clear()
        queries = make_queries(dtlp.graph, 8, seed=3)
        for k in (2, 8, 16):
            rows.append((k, f"{_mean_iters(dtlp, queries, k):.1f}"))
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record("iterations_vs_k.md", ["k (NY, xi=12)", "mean_iterations"], rows)
    assert float(rows[0][1]) <= float(rows[-1][1]), "iterations must rise with k"


def test_iterations_vs_alpha(benchmark, get_dtlp, make_queries, record):
    rows = []

    def run():
        rows.clear()
        for alpha in (0.1, 0.35, 0.6):
            dtlp = get_dtlp("NY", z=50, xi=12, alpha=alpha)
            queries = make_queries(dtlp.graph, 8, seed=4)
            rows.append((f"{alpha:.0%}", f"{_mean_iters(dtlp, queries, 8):.1f}"))
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record("iterations_vs_alpha.md", ["alpha (NY, k=8)", "mean_iterations"], rows)
