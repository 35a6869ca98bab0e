"""Figures 42-46: horizontal scalability.

The paper scales the Storm cluster from 2 to 20 servers; our local[*]
equivalent scales the number of Spark partitions the query batch fans
out over (each partition ~ one worker's QueryBolt).  Paper shape:
processing time falls markedly as workers are added, for every k, and
the relative speedup grows near-linearly.
"""
import time

from repro.distrib import process_batch_spark


def test_scaleout_query_batch(benchmark, spark, get_dtlp, make_queries, record):
    dtlp = get_dtlp("NY", z=50, xi=12)
    rows = []

    def run():
        rows.clear()
        queries = make_queries(dtlp.graph, 32, seed=11)
        base = None
        for workers in (1, 2, 4, 8, 16):
            t0 = time.perf_counter()
            process_batch_spark(spark, dtlp, queries, 2, n_partitions=workers, max_iterations=150)
            dt = time.perf_counter() - t0
            base = base or dt
            rows.append((workers, f"{dt:.1f}", f"{base / dt:.1f}x"))
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "scaleout_queries.md",
        ["#workers (NY, N_q=32, k=2)", "batch_s", "speedup"],
        rows,
    )


def test_scaleout_vs_k(benchmark, spark, get_dtlp, make_queries, record):
    """Figure 44 analogue: more workers help at every k."""
    dtlp = get_dtlp("NY", z=50, xi=12)
    rows = []

    def run():
        rows.clear()
        queries = make_queries(dtlp.graph, 16, seed=12)
        for k in (2, 8):
            times = []
            for workers in (2, 8):
                t0 = time.perf_counter()
                process_batch_spark(spark, dtlp, queries, k, n_partitions=workers, max_iterations=150)
                times.append(time.perf_counter() - t0)
            rows.append((k, f"{times[0]:.1f}", f"{times[1]:.1f}"))
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "scaleout_vs_k.md",
        ["k (NY, N_q=16)", "2 workers (s)", "8 workers (s)"],
        rows,
    )
