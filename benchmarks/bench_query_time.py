"""Figures 28-34: batch query processing time vs z, k, N_q, xi, tau.

Paper shapes: time vs z is U-shaped (skeleton shrinks vs per-subgraph
Yen cost grows); time grows ~linearly in k and in N_q (low slope thanks
to distribution); time falls with xi; rises with tau.
"""
import time

from repro.distrib import process_batch_spark


def _batch_time(spark, dtlp, queries, k):
    """One timed batch; the 150-iteration cap trims only the optimality-
    certification tail of pathological queries (see ksp_queries docs)."""
    t0 = time.perf_counter()
    process_batch_spark(spark, dtlp, queries, k, max_iterations=150)
    return time.perf_counter() - t0


def test_query_time_vs_z_and_k(benchmark, spark, get_dtlp, make_queries, record):
    rows = []

    def run():
        rows.clear()
        for z in (35, 50, 80):
            dtlp = get_dtlp("NY", z=z, xi=12)
            queries = make_queries(dtlp.graph, 16, seed=5)
            times = [f"{_batch_time(spark, dtlp, queries, k):.1f}" for k in (2, 8)]
            rows.append((z, *times))
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "query_time_vs_z_k.md",
        ["z (NY, N_q=16)", "k=2 (s)", "k=8 (s)"],
        rows,
    )


def test_query_time_vs_nq(benchmark, spark, get_dtlp, make_queries, record):
    """Figure 32: near-linear growth with batch size, low slope."""
    dtlp = get_dtlp("NY", z=50, xi=12)
    rows = []

    def run():
        rows.clear()
        for nq in (8, 16, 32, 64):
            queries = make_queries(dtlp.graph, nq, seed=6)
            rows.append((nq, f"{_batch_time(spark, dtlp, queries, 2):.1f}"))
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record("query_time_vs_nq.md", ["N_q (NY, k=2)", "batch_s"], rows)


def test_query_time_vs_xi_and_tau(benchmark, spark, get_dtlp, make_queries, record):
    rows = []

    def run():
        rows.clear()
        for xi in (4, 12):
            dtlp = get_dtlp("NY", z=50, xi=xi)
            queries = make_queries(dtlp.graph, 16, seed=7)
            rows.append((f"xi={xi}", f"{_batch_time(spark, dtlp, queries, 2):.1f}"))
        for tau in (0.1, 0.5):
            dtlp = get_dtlp("NY", z=50, xi=12, tau=tau)
            queries = make_queries(dtlp.graph, 16, seed=7)
            rows.append((f"tau={tau:.0%}", f"{_batch_time(spark, dtlp, queries, 2):.1f}"))
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "query_time_vs_xi_tau.md",
        ["setting (NY, N_q=16, k=2)", "batch_s"],
        rows,
    )
