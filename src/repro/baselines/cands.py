"""CANDS baseline [26]: distributed single-shortest-path on a dynamic graph.

CANDS partitions the graph like KSP-DG but indexes the **exact current
shortest path** between every pair of boundary vertices inside each
subgraph.  A query expands from the source subgraph across the overlay
of indexed boundary-pair paths until the destination subgraph is
reached.  The paper's comparison (Figures 40-41) shows the two sides of
that choice:

* k=1 queries are *faster* than KSP-DG — the overlay search needs no
  filter/refine iterations because the indexed distances are exact, and
* maintenance is *much more expensive* — a weight change invalidates the
  indexed shortest paths of every affected subgraph, which must be
  recomputed from scratch (unlike DTLP's weight-insensitive bounding
  paths).

The sequential frontier expansion of the original system is realized as
a Dijkstra over the overlay graph, which visits subgraphs in the same
expanding-wavefront order.  Correctness: between two consecutive
boundary-vertex visits, any path in G stays within one subgraph (edges
are partitioned), so the overlay preserves shortest distances exactly.
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Dict, List, Optional, Set, Tuple

from ..core.dijkstra import dijkstra
from ..core.partition import Partition, bfs_partition
from ..roadnet.graph import Edge, Graph

Path = List[int]


@dataclass
class CANDSStats:
    """Maintenance-cost counters for one update batch.

    ``n_dijkstra_runs`` is the number of full graph searches the update
    performed — the work class DTLP maintenance avoids entirely (its
    updates are arithmetic shifts + one bulk bound recomputation).
    """

    n_deltas: int
    n_subgraphs_recomputed: int
    n_pairs_recomputed: int
    n_dijkstra_runs: int
    elapsed_s: float


class CANDS:
    """Boundary-pair exact shortest-path index + overlay SSP search."""

    def __init__(self, graph: Graph, partition: Partition) -> None:
        self.graph = graph
        self.partition = partition
        #: (sg_id) -> {(a, b) -> (path, dist)} with a < b for undirected
        self._index: Dict[int, Dict[Tuple[int, int], Tuple[Path, float]]] = {}
        self.n_pairs_indexed = 0
        for sg in partition.subgraphs:
            self._index[sg.sg_id] = self._index_subgraph(sg.sg_id)
            self.n_pairs_indexed += len(self._index[sg.sg_id])

    @classmethod
    def build(cls, graph: Graph, *, z: int) -> "CANDS":
        return cls(graph, bfs_partition(graph, z))

    # -- index construction / maintenance ---------------------------------
    def _index_subgraph(self, sg_id: int) -> Dict[Tuple[int, int], Tuple[Path, float]]:
        """All-boundary-pairs shortest paths within one subgraph.

        One Dijkstra per boundary vertex (not per pair), reading off the
        distances to the other boundary vertices.
        """
        sg = self.partition.subgraphs[sg_id]
        boundary = self.partition.boundary_of(sg_id)
        out: Dict[Tuple[int, int], Tuple[Path, float]] = {}
        for i, a in enumerate(boundary):
            dist, pred = dijkstra(sg.neighbors, a)
            for b in boundary[i + 1 :]:
                if b not in dist:
                    continue
                path = [b]
                while path[-1] != a:
                    path.append(pred[path[-1]])
                path.reverse()
                out[(a, b)] = (path, dist[b])
        return out

    def update(self, deltas: List[Tuple[Edge, float]], *, apply_to_graph: bool = True) -> CANDSStats:
        """Recompute the index of every subgraph touching a changed edge."""
        t0 = time.perf_counter()
        affected: Set[int] = set()
        for (u, v), dw in deltas:
            if dw == 0.0:
                continue
            if apply_to_graph:
                self.graph.set_weight(u, v, self.graph.weight(u, v) + dw)
            e = self.graph.canonical(u, v)
            sg = self.partition.subgraph_of_edge.get(e)
            if sg is not None:
                affected.add(sg)
        n_pairs = 0
        n_dijkstra = 0
        for sg_id in affected:
            self._index[sg_id] = self._index_subgraph(sg_id)
            n_pairs += len(self._index[sg_id])
            n_dijkstra += len(self.partition.boundary_of(sg_id))
        return CANDSStats(
            n_deltas=len(deltas),
            n_subgraphs_recomputed=len(affected),
            n_pairs_recomputed=n_pairs,
            n_dijkstra_runs=n_dijkstra,
            elapsed_s=time.perf_counter() - t0,
        )

    # -- query -------------------------------------------------------------
    def shortest_path(self, s: int, t: int) -> Optional[Tuple[Path, float]]:
        """Single shortest path via the overlay of indexed boundary paths."""
        if s == t:
            return [s], 0.0
        overlay: Dict[int, Dict[int, Tuple[float, Path]]] = {}

        def add(u: int, v: int, dist: float, path: Path) -> None:
            cur = overlay.setdefault(u, {}).get(v)
            if cur is None or dist < cur[0]:
                overlay.setdefault(u, {})[v] = (dist, path)
                overlay.setdefault(v, {})[u] = (dist, list(reversed(path)))

        for per_sg in self._index.values():
            for (a, b), (path, dist) in per_sg.items():
                add(a, b, dist, path)
        # Attach endpoints: shortest paths from s (and t) to each boundary
        # vertex of their home subgraphs, computed at query time — the
        # entrance step of CANDS.
        for v in (s, t):
            if self.partition.is_boundary(v):
                continue
            for sg_id in self.partition.home_subgraphs(v):
                sg = self.partition.subgraphs[sg_id]
                dist, pred = dijkstra(sg.neighbors, v)
                targets = set(self.partition.boundary_of(sg_id))
                if s != v and s in sg.vertex_set:
                    targets.add(s)
                if t != v and t in sg.vertex_set:
                    targets.add(t)
                for b in targets:
                    if b == v or b not in dist:
                        continue
                    path = [b]
                    while path[-1] != v:
                        path.append(pred[path[-1]])
                    path.reverse()
                    add(v, b, dist[b], path)

        def nbrs(u: int):
            for v, (d, _) in overlay.get(u, {}).items():
                yield v, d

        dist, pred = dijkstra(nbrs, s, target=t)
        if t not in dist:
            return None
        hops = [t]
        while hops[-1] != s:
            hops.append(pred[hops[-1]])
        hops.reverse()
        full: Path = [s]
        for a, b in zip(hops, hops[1:]):
            seg = overlay[a][b][1]
            full.extend(seg[1:])
        return full, dist[t]
