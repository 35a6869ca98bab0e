"""Figures 40-41: KSP-DG vs CANDS at k=1 — query cost and maintenance.

Paper shape: CANDS answers single-shortest-path queries faster (its
boundary-pair index stores exact shortest paths, no filter/refine
iterations), but its maintenance is far more expensive than DTLP's when
many weights change (alpha=50%), because the indexed paths must be
recomputed while DTLP's bounding-path routes never change.
"""
import time

from repro.baselines import CANDS
from repro.core import ksp_dg
from repro.roadnet import snapshot_deltas


def test_cands_vs_kspdg_queries_k1(benchmark, get_dtlp, clone_dtlp, make_queries, record):
    rows = []

    def run():
        rows.clear()
        dtlp = get_dtlp("NY", z=50, xi=12)
        cands = CANDS(dtlp.graph, dtlp.partition)
        queries = make_queries(dtlp.graph, 32, seed=10)
        t0 = time.perf_counter()
        for s, t in queries:
            cands.shortest_path(s, t)
        t_cands = time.perf_counter() - t0
        t0 = time.perf_counter()
        for s, t in queries:
            ksp_dg(dtlp, s, t, 1, max_iterations=150)
        t_dg = time.perf_counter() - t0
        rows.append((len(queries), f"{t_cands:.2f}", f"{t_dg:.2f}"))
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "cands_queries_k1.md",
        ["N_q (NY, k=1)", "CANDS (s)", "KSP-DG (s)"],
        rows,
    )


def test_cands_vs_dtlp_maintenance(benchmark, get_dtlp, clone_dtlp, record):
    rows = []

    def run():
        rows.clear()
        base = get_dtlp("NY", z=50, xi=12, alpha=0.0)
        dtlp = clone_dtlp(base)
        # CANDS shares the clone's graph and partition so both systems
        # index identical state; DTLP applies the weight deltas, CANDS
        # then re-indexes from the already-updated shared graph.
        cands = CANDS(dtlp.graph, dtlp.partition)
        for i in range(3):
            deltas = snapshot_deltas(dtlp.graph, alpha=0.5, tau=0.5, seed=60 + i)
            t0 = time.perf_counter()
            dtlp.update(deltas)
            t_dtlp = time.perf_counter() - t0
            t0 = time.perf_counter()
            c_stats = cands.update(deltas, apply_to_graph=False)
            t_cands = time.perf_counter() - t0
            rows.append(
                (i, f"{t_cands * 1e3:.0f}", f"{t_dtlp * 1e3:.0f}",
                 c_stats.n_dijkstra_runs, 0)
            )
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "cands_maintenance.md",
        ["batch (NY, alpha=50%)", "CANDS_ms", "DTLP_ms",
         "CANDS graph searches", "DTLP graph searches"],
        rows,
    )
