"""Figures 19 & 22-23: DTLP maintenance cost vs xi and vs alpha.

Paper shape: maintenance time rises with xi (more bounding paths to
shift) with a flattening rate, and rises with alpha (more deltas).
Absolute times are milliseconds at our scale — the paper's are seconds
at 100-700x the graph size.  Destructive benches run on clones so the
session DTLP cache stays consistent.
"""
import time

from repro.roadnet import snapshot_deltas


def test_maintenance_vs_xi(benchmark, get_dtlp, clone_dtlp, record):
    rows = []

    def run():
        rows.clear()
        for xi in (4, 8, 12):
            dtlp = clone_dtlp(get_dtlp("NY", z=50, xi=xi, alpha=0.0))
            deltas = snapshot_deltas(dtlp.graph, alpha=0.5, tau=0.5, seed=33)
            t0 = time.perf_counter()
            stats = dtlp.update(deltas)
            rows.append(
                (xi, f"{(time.perf_counter() - t0) * 1e3:.0f}",
                 stats.n_paths_touched, dtlp.ep.n_entries)
            )
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "maintenance_vs_xi.md",
        ["xi (NY, alpha=50%)", "update_ms", "paths_touched", "ep_entries"],
        rows,
    )


def test_maintenance_vs_alpha(benchmark, get_dtlp, clone_dtlp, record):
    rows = []

    def run():
        rows.clear()
        for i, alpha in enumerate((0.1, 0.3, 0.5)):
            dtlp = clone_dtlp(get_dtlp("NY", z=50, xi=8, alpha=0.0))
            deltas = snapshot_deltas(dtlp.graph, alpha=alpha, tau=0.5, seed=40 + i)
            t0 = time.perf_counter()
            stats = dtlp.update(deltas)
            rows.append(
                (f"{alpha:.0%}", f"{(time.perf_counter() - t0) * 1e3:.0f}",
                 stats.n_deltas, stats.n_paths_touched)
            )
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "maintenance_vs_alpha.md",
        ["alpha (NY, xi=8)", "update_ms", "n_deltas", "paths_touched"],
        rows,
    )


def test_maintenance_throughput(benchmark, get_dtlp, clone_dtlp, record):
    """Figure 21 analogue: continuous rounds of weight updates; the paper
    reports throughput/latency roughly flat across graph sizes."""
    rows = []

    def run():
        rows.clear()
        for name in ("NY", "COL"):
            dtlp = clone_dtlp(get_dtlp(name, z=50, xi=4, alpha=0.0))
            n_rounds = 5
            t0 = time.perf_counter()
            n_deltas = 0
            for i in range(n_rounds):
                d = snapshot_deltas(dtlp.graph, alpha=0.5, tau=0.3, seed=50 + i)
                dtlp.update(d)
                n_deltas += len(d)
            dt = time.perf_counter() - t0
            rows.append(
                (name, f"{n_deltas / dt:.0f}", f"{dt / n_deltas * 1e6:.1f}")
            )
        return rows

    benchmark.pedantic(run, rounds=1, iterations=1)
    record(
        "maintenance_throughput.md",
        ["dataset", "updates_per_s", "latency_us_per_update"],
        rows,
    )
