"""Figures 35-39: KSP-DG vs FindKSP vs Yen on query batches.

Paper shape: KSP-DG beats both centralized baselines on batch
throughput with a much lower growth rate in N_q (it parallelizes the
batch; they are sequential), and the gap widens on larger graphs; in k,
Yen grows fastest, FindKSP slower, KSP-DG slowest growth.
"""
import time

from repro.baselines import find_ksp
from repro.core import yen_ksp
from repro.distrib import process_batch_spark


def _sequential(algo_fn, graph, queries, k):
    t0 = time.perf_counter()
    for s, t in queries:
        algo_fn(graph.neighbors, s, t, k)
    return time.perf_counter() - t0


def test_baselines_vs_nq(benchmark, spark, get_dtlp, make_queries, record):
    """Figures 35-38 analogue on NY and FLA."""
    rows = []

    def run():
        rows.clear()
        for name, z in (("NY", 50), ("FLA", 80)):
            dtlp = get_dtlp(name, z=z, xi=12)
            g = dtlp.graph
            for nq in (4, 8, 16):
                queries = make_queries(g, nq, seed=8)
                t0 = time.perf_counter()
                process_batch_spark(spark, dtlp, queries, 2, max_iterations=150)
                t_dg = time.perf_counter() - t0
                t_yen = _sequential(yen_ksp, g, queries, 2)
                t_fk = _sequential(find_ksp, g, queries, 2)
                rows.append(
                    (name, nq, f"{t_dg:.1f}", f"{t_fk:.1f}", f"{t_yen:.1f}")
                )
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "baselines_vs_nq.md",
        ["dataset", "N_q (k=2)", "KSP-DG (s)", "FindKSP (s)", "Yen (s)"],
        rows,
    )


def test_baselines_vs_k(benchmark, spark, get_dtlp, make_queries, record):
    """Figure 39 analogue (paper uses FLA; growth rates are the claim)."""
    rows = []

    def run():
        rows.clear()
        dtlp = get_dtlp("FLA", z=80, xi=12)
        g = dtlp.graph
        queries = make_queries(g, 8, seed=9)
        for k in (2, 4, 8):
            t0 = time.perf_counter()
            process_batch_spark(spark, dtlp, queries, k, max_iterations=150)
            t_dg = time.perf_counter() - t0
            t_yen = _sequential(yen_ksp, g, queries, k)
            t_fk = _sequential(find_ksp, g, queries, k)
            rows.append((k, f"{t_dg:.1f}", f"{t_fk:.1f}", f"{t_yen:.1f}"))
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "baselines_vs_k.md",
        ["k (FLA, N_q=8)", "KSP-DG (s)", "FindKSP (s)", "Yen (s)"],
        rows,
    )
