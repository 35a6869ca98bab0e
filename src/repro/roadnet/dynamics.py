"""Traffic dynamics: the paper's edge-weight evolution model.

Section 6.2: *"we adopt a well-established model [5] to dynamically vary
the travel time in each road ... We use alpha to represent the percentage
of edges that change weights at each snapshot, and [-tau, tau] to denote
the range of weight variation."*  Defaults alpha=35%, tau=30% match the
paper's.

A snapshot draws, for each selected edge, a relative perturbation
``delta ~ U[-tau, tau]`` applied to the *initial* weight:
``w <- max(eps, w0 * (1 + delta))``.  Anchoring at ``w0`` keeps weights
from drifting to zero/infinity over many snapshots, mirroring travel
times oscillating around a free-flow baseline [5].  An optional ``trend``
term shifts all deltas together — Section 5.5 assumes "all roads have a
similar varying trend in travel times", and the iteration-count
experiments exercise both modes.

For directed graphs the paper applies *identical* changes to the two
opposite edges to simulate an undirected dynamic graph, or independent
changes for the directed case; ``mirror_directed`` selects this.
"""
from __future__ import annotations

from typing import Dict, List, Tuple

import numpy as np

from .graph import Edge, Graph

_MIN_WEIGHT = 1e-6


def snapshot_deltas(
    graph: Graph,
    *,
    alpha: float = 0.35,
    tau: float = 0.30,
    trend: float = 0.0,
    seed: int = 0,
    mirror_directed: bool = True,
) -> List[Tuple[Edge, float]]:
    """One snapshot of weight changes: ``[(edge, delta_w), ...]``.

    ``delta_w`` is the *absolute* change to apply (``new_w - old_w``), the
    form consumed by DTLP maintenance (Algorithm 2 takes ``delta_w``).
    Deterministic in ``seed``.  The graph is not modified.
    """
    if not (0.0 <= alpha <= 1.0):
        raise ValueError(f"alpha must be in [0, 1], got {alpha}")
    if not (0.0 <= tau):
        raise ValueError(f"tau must be non-negative, got {tau}")
    rng = np.random.default_rng(seed)
    all_edges = sorted(graph.edges())
    if graph.directed and mirror_directed:
        # Pick undirected pairs; apply the same relative change to both
        # directions (paper Section 6.2).
        pairs = sorted({(min(u, v), max(u, v)) for u, v in all_edges})
        n_change = int(round(alpha * len(pairs)))
        chosen = rng.choice(len(pairs), size=n_change, replace=False)
        deltas: List[Tuple[Edge, float]] = []
        for i in chosen:
            u, v = pairs[int(i)]
            rel = float(rng.uniform(-tau, tau)) + trend
            for e in ((u, v), (v, u)):
                if graph.has_edge(*e):
                    w0 = graph.init_weight(*e)
                    new_w = max(_MIN_WEIGHT, w0 * (1.0 + rel))
                    deltas.append((e, new_w - graph.weight(*e)))
        return deltas

    n_change = int(round(alpha * len(all_edges)))
    chosen = rng.choice(len(all_edges), size=n_change, replace=False)
    deltas = []
    for i in sorted(int(c) for c in chosen):
        u, v = all_edges[i]
        rel = float(rng.uniform(-tau, tau)) + trend
        w0 = graph.init_weight(u, v)
        new_w = max(_MIN_WEIGHT, w0 * (1.0 + rel))
        deltas.append(((u, v), new_w - graph.weight(u, v)))
    return deltas


def apply_deltas(graph: Graph, deltas: List[Tuple[Edge, float]]) -> None:
    """Apply absolute weight changes in place."""
    for (u, v), dw in deltas:
        graph.set_weight(u, v, max(_MIN_WEIGHT, graph.weight(u, v) + dw))


def evolve(
    graph: Graph,
    *,
    n_snapshots: int,
    alpha: float = 0.35,
    tau: float = 0.30,
    trend: float = 0.0,
    seed: int = 0,
) -> Dict[int, List[Tuple[Edge, float]]]:
    """Apply ``n_snapshots`` consecutive snapshots in place.

    Returns the per-snapshot delta lists (for feeding maintenance
    experiments the same change stream the graph saw).
    """
    history: Dict[int, List[Tuple[Edge, float]]] = {}
    for i in range(n_snapshots):
        d = snapshot_deltas(
            graph, alpha=alpha, tau=tau, trend=trend, seed=seed + i
        )
        apply_deltas(graph, d)
        history[i] = d
    return history
