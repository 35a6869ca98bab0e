"""Synthetic road networks standing in for the DIMACS datasets.

The paper evaluates on four DIMACS travel-time road networks (Table 1):
NY (264k vertices), COL (436k), FLA (1.07M) and CUSA (14.1M).  Those
inputs are not available offline and are far beyond a single-process
Spark container, so this module generates *-lite* equivalents: perturbed
grid graphs that preserve the structural properties DTLP exploits —

* near-planar and sparse (DIMACS avg degree ~2.5-2.8 per direction);
* integer travel-time weights (vfrag semantics require integer ``w0``);
* locality: BFS partitions produce subgraphs with small boundary sets.

Scale is reduced ~100-700x (documented in DESIGN.md section 2); the
experiment harnesses scale the subgraph-size parameter ``z`` down
accordingly so the subgraph/boundary counts stay in proportion.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Tuple

import numpy as np

from .graph import Graph


@dataclass(frozen=True)
class RoadNetSpec:
    """Shape of a synthetic road network.

    ``rows x cols`` grid cells; ``drop_frac`` of non-bridge edges are
    removed to create irregular blocks; ``diag_frac`` of cells gain a
    diagonal shortcut (overpasses / diagonal avenues).
    """

    name: str
    rows: int
    cols: int
    drop_frac: float = 0.28
    diag_frac: float = 0.06
    max_w0: int = 100
    default_z: int = 50


#: Laptop-scale stand-ins for the paper's Table 1 datasets.  Vertex and
#: edge counts land within a few percent of rows*cols and ~1.6x that.
DATASETS: Dict[str, RoadNetSpec] = {
    "NY": RoadNetSpec("NY", 50, 50, default_z=50),
    "COL": RoadNetSpec("COL", 64, 64, default_z=50),
    "FLA": RoadNetSpec("FLA", 96, 96, default_z=80),
    "CUSA": RoadNetSpec("CUSA", 144, 144, default_z=100),
}


def grid_road_network(
    rows: int,
    cols: int,
    *,
    drop_frac: float = 0.28,
    diag_frac: float = 0.06,
    max_w0: int = 100,
    seed: int = 0,
    directed: bool = False,
) -> Graph:
    """A perturbed ``rows x cols`` grid road network.

    Deterministic in ``seed``.  Connectivity is guaranteed: a random
    spanning tree over the grid's edges is kept, and only the remaining
    edges are subject to ``drop_frac`` removal.  Weights are integer
    travel times in ``[1, max_w0]``, skewed low (most roads are short).
    """
    if rows < 2 or cols < 2:
        raise ValueError("grid must be at least 2x2")
    rng = np.random.default_rng(seed)

    def vid(r: int, c: int) -> int:
        return r * cols + c

    grid_edges: List[Tuple[int, int]] = []
    for r in range(rows):
        for c in range(cols):
            if c + 1 < cols:
                grid_edges.append((vid(r, c), vid(r, c + 1)))
            if r + 1 < rows:
                grid_edges.append((vid(r, c), vid(r + 1, c)))

    # Random spanning tree via randomized Kruskal (union-find) so the
    # dropped edges never disconnect the network.
    parent = list(range(rows * cols))

    def find(x: int) -> int:
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    order = rng.permutation(len(grid_edges))
    tree: set = set()
    for idx in order:
        u, v = grid_edges[idx]
        ru, rv = find(u), find(v)
        if ru != rv:
            parent[ru] = rv
            tree.add((u, v))

    keep: List[Tuple[int, int]] = []
    for e in grid_edges:
        if e in tree or rng.random() >= drop_frac:
            keep.append(e)

    # Diagonal shortcuts inside a fraction of the cells.
    for r in range(rows - 1):
        for c in range(cols - 1):
            if rng.random() < diag_frac:
                if rng.random() < 0.5:
                    keep.append((vid(r, c), vid(r + 1, c + 1)))
                else:
                    keep.append((vid(r, c + 1), vid(r + 1, c)))

    g = Graph(directed=directed)
    # Travel times: mostly short roads, occasional long ones (skewed).
    w0s = 1 + np.minimum(
        rng.geometric(p=0.08, size=len(keep)) - 1, max_w0 - 1
    ).astype(int)
    for (u, v), w0 in zip(keep, w0s):
        g.add_edge(u, v, int(w0))
        if directed:
            # Opposite-direction edge with the same initial weight, as in
            # DIMACS travel-time graphs (weights may later diverge).
            g.add_edge(v, u, int(w0))
    return g


def load_dataset(name: str, *, seed: int = 7, directed: bool = False) -> Graph:
    """Build the *-lite* stand-in for a paper dataset (``NY``/``COL``/``FLA``/``CUSA``)."""
    spec = DATASETS[name]
    return grid_road_network(
        spec.rows,
        spec.cols,
        drop_frac=spec.drop_frac,
        diag_frac=spec.diag_frac,
        max_w0=spec.max_w0,
        seed=seed,
        directed=directed,
    )


def random_connected_graph(
    n: int,
    *,
    extra_edge_frac: float = 0.6,
    max_w0: int = 20,
    seed: int = 0,
    directed: bool = False,
) -> Graph:
    """Small random connected graph — the workhorse of correctness tests.

    A random tree over ``n`` vertices plus ``extra_edge_frac * n`` random
    non-tree edges, integer weights in ``[1, max_w0]``.
    """
    if n < 2:
        raise ValueError("need at least 2 vertices")
    rng = np.random.default_rng(seed)
    g = Graph(directed=directed)
    edges = set()
    for v in range(1, n):
        u = int(rng.integers(0, v))
        edges.add((min(u, v), max(u, v)))
    n_extra = int(extra_edge_frac * n)
    while n_extra > 0:
        u, v = int(rng.integers(0, n)), int(rng.integers(0, n))
        if u == v:
            continue
        e = (min(u, v), max(u, v))
        if e in edges:
            continue
        edges.add(e)
        n_extra -= 1
    for u, v in sorted(edges):
        w0 = int(rng.integers(1, max_w0 + 1))
        g.add_edge(u, v, w0)
        if directed:
            g.add_edge(v, u, int(rng.integers(1, max_w0 + 1)))
    return g
