"""The skeleton graph ``G_lambda`` (Section 3.6) and query attachment (5.3).

``G_lambda`` contains every boundary vertex; a pair of boundary vertices
co-resident in some subgraph is connected by an edge weighted with their
*minimum lower bound distance* ``MBD`` (the least LBD across the
subgraphs containing both).  It is tiny relative to G and — in the
paper — replicated to every worker; here it is a plain picklable object
handed to Spark via broadcast.

Non-boundary query endpoints are attached per Section 5.3: a virtual
vertex ``v`` gains an edge to every boundary vertex of its home
subgraph, weighted with the on-the-fly LBD between them; two endpoints
sharing a subgraph also gain a direct virtual edge (otherwise paths that
never touch a boundary vertex would be unreachable in ``G_lambda``).
"""
from __future__ import annotations

from typing import Dict, Iterator, List, Optional, Tuple

from ..roadnet.graph import Graph
from .bounding import SubgraphIndex, bounding_paths, lower_bound_distance
from .partition import Partition


class SkeletonGraph:
    """Small in-memory weighted graph with the Dijkstra/Yen neighbor API."""

    def __init__(self, directed: bool = False) -> None:
        self.directed = directed
        self._adj: Dict[int, Dict[int, float]] = {}

    def set_edge(self, u: int, v: int, w: float) -> None:
        self._adj.setdefault(u, {})[v] = w
        if not self.directed:
            self._adj.setdefault(v, {})[u] = w
        else:
            self._adj.setdefault(v, {})

    def weight(self, u: int, v: int) -> float:
        return self._adj[u][v]

    def has_edge(self, u: int, v: int) -> bool:
        return v in self._adj.get(u, {})

    def neighbors(self, u: int) -> Iterator[Tuple[int, float]]:
        return iter(self._adj.get(u, {}).items())

    @property
    def vertices(self):
        return self._adj.keys()

    @property
    def n_vertices(self) -> int:
        return len(self._adj)

    @property
    def n_edges(self) -> int:
        total = sum(len(nbrs) for nbrs in self._adj.values())
        return total if self.directed else total // 2

    def copy(self) -> "SkeletonGraph":
        s = SkeletonGraph(directed=self.directed)
        s._adj = {u: dict(nbrs) for u, nbrs in self._adj.items()}
        return s

    def __repr__(self) -> str:  # pragma: no cover - debugging aid
        return f"SkeletonGraph(|V|={self.n_vertices}, |E|={self.n_edges})"


def build_skeleton(
    sub_indexes: List[SubgraphIndex], *, directed: bool = False
) -> Tuple[SkeletonGraph, Dict[Tuple[int, int], Dict[int, float]]]:
    """Aggregate per-subgraph LBDs into ``G_lambda``.

    Returns the skeleton and the ``pair -> {sg_id -> LBD}`` table that
    maintenance needs to recompute an ``MBD`` after one subgraph's LBD
    changes without touching the others.
    """
    pair_lbd: Dict[Tuple[int, int], Dict[int, float]] = {}
    for idx in sub_indexes:
        for pair, lbd in idx.lbd_items().items():
            pair_lbd.setdefault(pair, {})[idx.subgraph.sg_id] = lbd
    skeleton = SkeletonGraph(directed=directed)
    for (a, b), per_sg in pair_lbd.items():
        skeleton.set_edge(a, b, min(per_sg.values()))
    return skeleton, pair_lbd


def attach_query_vertices(
    skeleton: SkeletonGraph,
    partition: Partition,
    sub_indexes: List[SubgraphIndex],
    s: int,
    t: int,
    xi: int,
) -> SkeletonGraph:
    """Section 5.3: return a copy of ``G_lambda`` with ``s``/``t`` attached.

    Boundary endpoints are already skeleton vertices and need no work.
    The returned skeleton is a private copy — concurrent queries never
    see each other's virtual vertices (each QueryBolt in the paper
    augments its own replica likewise).
    """
    aug = skeleton.copy()
    directed = skeleton.directed
    virtual = [v for v in (s, t) if not partition.is_boundary(v)]
    other = {s: t, t: s}
    for v in virtual:
        for sg_id in partition.home_subgraphs(v):
            idx = sub_indexes[sg_id]
            targets = [b for b in partition.boundary_of(sg_id) if b != v]
            # Direct virtual edge when both endpoints live in the same
            # subgraph and at least one is non-boundary (a boundary pair
            # would already have a skeleton edge); without it, paths that
            # never touch a boundary vertex would be missed.
            ov = other[v]
            if ov != v and ov in idx.subgraph.vertex_set and ov not in targets:
                targets.append(ov)
            banned = frozenset(partition.boundary_of(sg_id))
            for b in targets:
                _attach_pair(aug, idx, v, b, xi, directed, banned)
    return aug


def _attach_pair(
    aug: SkeletonGraph,
    idx: SubgraphIndex,
    u: int,
    v: int,
    xi: int,
    directed: bool,
    banned: frozenset,
) -> None:
    """Add LBD-weighted edge(s) between ``u`` and ``v`` computed on the fly.

    ``banned`` carries the subgraph's boundary vertices: the virtual edge
    stands in for the segment between a query endpoint and its *first*
    boundary-vertex visit (or, for a same-subgraph endpoint pair, a
    segment with no boundary visit at all), so intermediate boundary
    vertices are excluded exactly as in the index build.
    """
    lbd = _fly_lbd(idx, u, v, xi, directed, banned)
    if lbd is not None:
        if aug.has_edge(u, v):
            lbd = min(lbd, aug.weight(u, v))
        aug.set_edge(u, v, lbd)
    if directed:
        back = _fly_lbd(idx, v, u, xi, True, banned)
        if back is not None:
            if aug.has_edge(v, u):
                back = min(back, aug.weight(v, u))
            aug.set_edge(v, u, back)


def _fly_lbd(
    idx: SubgraphIndex,
    u: int,
    v: int,
    xi: int,
    directed: bool,
    banned: frozenset = frozenset(),
) -> Optional[float]:
    h = None if directed else idx.init_dist_to(v)
    if h is not None and u not in h:
        return None  # v unreachable from u within this subgraph
    bset = bounding_paths(
        idx.subgraph, u, v, xi, directed=directed, h=h, banned=banned
    )
    if not bset.paths:
        return None
    return lower_bound_distance(bset, idx.uw)
