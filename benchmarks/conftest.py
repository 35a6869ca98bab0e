"""Shared benchmark fixtures: cached DTLP builds and result recording.

Every benchmark writes its table to ``benchmarks/results/<name>.md`` (in
addition to stdout) — EXPERIMENTS.md quotes those files verbatim next to
the paper's numbers.  DTLP builds are cached per parameterization so
sweeps sharing a build don't pay for it repeatedly.
"""
import pathlib
import random

import pytest

from repro.core import DTLP
from repro.distrib import build_dtlp_spark
from repro.roadnet import apply_deltas, load_dataset, snapshot_deltas

RESULTS_DIR = pathlib.Path(__file__).parent / "results"


@pytest.fixture(scope="session")
def results_dir():
    RESULTS_DIR.mkdir(exist_ok=True)
    return RESULTS_DIR


@pytest.fixture(scope="session")
def record(results_dir):
    """record(fname, header, rows): write a markdown table + echo it."""

    def _rec(fname, header, rows):
        lines = [
            "| " + " | ".join(header) + " |",
            "|" + "---|" * len(header),
        ]
        for r in rows:
            lines.append("| " + " | ".join(str(x) for x in r) + " |")
        text = "\n".join(lines) + "\n"
        (results_dir / fname).write_text(text)
        print(f"\n=== {fname} ===\n{text}")

    return _rec


@pytest.fixture(scope="session")
def _dtlp_store():
    return {}


@pytest.fixture(scope="session")
def get_graph(_dtlp_store):
    """Perturbed dataset graph, cached (alpha/tau per the paper defaults)."""

    def _get(name, *, alpha=0.35, tau=0.30, seed=1):
        key = ("graph", name, alpha, tau, seed)
        if key not in _dtlp_store:
            g = load_dataset(name)
            if alpha > 0:
                apply_deltas(g, snapshot_deltas(g, alpha=alpha, tau=tau, seed=seed))
            _dtlp_store[key] = g
        return _dtlp_store[key]

    return _get


@pytest.fixture(scope="session")
def get_dtlp(spark, _dtlp_store, get_graph):
    """Distributed-build DTLP over the cached perturbed graph, cached."""

    def _get(name, *, z, xi, alpha=0.35, tau=0.30, seed=1):
        key = ("dtlp", name, z, xi, alpha, tau, seed)
        if key not in _dtlp_store:
            g = get_graph(name, alpha=alpha, tau=tau, seed=seed)
            dtlp, _ = build_dtlp_spark(spark, g, z=z, xi=xi)
            _dtlp_store[key] = dtlp
        return _dtlp_store[key]

    return _get


@pytest.fixture(scope="session")
def clone_dtlp():
    """Deep-copy a cached DTLP (graph included) so destructive benches
    (maintenance applies weight deltas) never corrupt the shared cache."""
    import pickle

    def _clone(dtlp):
        return pickle.loads(pickle.dumps(dtlp))

    return _clone


@pytest.fixture(scope="session")
def make_queries():
    """Deterministic random query workload over a graph's vertices."""

    def _make(graph, n, seed=0):
        rnd = random.Random(seed)
        verts = sorted(graph.vertices)
        return [tuple(rnd.sample(verts, 2)) for _ in range(n)]

    return _make
