"""Yen's algorithm [27]: k shortest loopless paths.

Used in three places, exactly as in the paper:

* reference paths — the i-th shortest path in the skeleton graph
  ``G_lambda`` (Algorithm 3 needs them lazily, one per iteration, so
  :func:`yen_iter` is a generator);
* partial KSPs between adjacent boundary vertices inside one subgraph
  (Algorithm 4, line 6);
* the centralized Yen baseline on the full graph (Section 6.5).

The implementation is the classic deviation paradigm: each accepted path
spawns spur searches from every prefix, with the prefix's vertices and
the deviation edges of previously accepted paths banned.  A ``spur_fn``
hook lets the FindKSP baseline substitute A* spur searches while reusing
the identical deviation bookkeeping.
"""
from __future__ import annotations

import heapq
from itertools import count
from typing import Callable, FrozenSet, Iterator, List, Optional, Tuple

from .dijkstra import NeighborsFn, shortest_path

Path = List[int]
SpurFn = Callable[..., Optional[Tuple[Path, float]]]


def yen_iter(
    neighbors_fn: NeighborsFn,
    source: int,
    target: int,
    *,
    directed: bool = False,
    spur_fn: Optional[SpurFn] = None,
) -> Iterator[Tuple[Path, float]]:
    """Yield loopless ``source -> target`` paths in non-decreasing distance.

    Stops when the path space is exhausted.  ``spur_fn`` defaults to
    Dijkstra-based :func:`~repro.core.dijkstra.shortest_path`; it is
    called as ``spur_fn(neighbors_fn, spur, target, banned_vertices=...,
    banned_edges=...)``.
    """
    spur_search: SpurFn = spur_fn if spur_fn is not None else shortest_path
    first = shortest_path(neighbors_fn, source, target)
    if first is None:
        return
    accepted: List[Tuple[Path, float]] = []
    seen: set = set()
    # Candidate heap entries: (dist, tiebreak, path).  The tiebreak makes
    # heap ordering total without comparing lists.
    tie = count()
    candidates: List[Tuple[float, int, Path]] = []
    path, dist = first
    while True:
        accepted.append((path, dist))
        seen.add(tuple(path))
        yield path, dist
        # Generate deviations of the path just accepted.
        for i in range(len(path) - 1):
            root = path[: i + 1]
            spur = path[i]
            banned_edges = set()
            for p, _ in accepted:
                if len(p) > i and p[: i + 1] == root:
                    e = (p[i], p[i + 1])
                    banned_edges.add(e)
                    if not directed:
                        banned_edges.add((e[1], e[0]))
            banned_vertices = frozenset(root[:-1])
            res = spur_search(
                neighbors_fn,
                spur,
                target,
                banned_vertices=banned_vertices,
                banned_edges=frozenset(banned_edges),
            )
            if res is None:
                continue
            spur_path, spur_dist = res
            total = root[:-1] + spur_path
            key = tuple(total)
            if key in seen:
                continue
            seen.add(key)
            root_dist = _prefix_distance(neighbors_fn, root)
            heapq.heappush(candidates, (root_dist + spur_dist, next(tie), total))
        if not candidates:
            return
        dist, _, path = heapq.heappop(candidates)


def _prefix_distance(neighbors_fn: NeighborsFn, root: Path) -> float:
    total = 0.0
    for a, b in zip(root, root[1:]):
        for v, w in neighbors_fn(a):
            if v == b:
                total += w
                break
        else:  # pragma: no cover - indicates an internal inconsistency
            raise KeyError(f"edge ({a}, {b}) missing while costing prefix")
    return total


def yen_ksp(
    neighbors_fn: NeighborsFn,
    source: int,
    target: int,
    k: int,
    *,
    directed: bool = False,
    spur_fn: Optional[SpurFn] = None,
) -> List[Tuple[Path, float]]:
    """The k shortest loopless paths (fewer if the graph has fewer)."""
    if k < 1:
        raise ValueError(f"k must be >= 1, got {k}")
    out: List[Tuple[Path, float]] = []
    for path, dist in yen_iter(
        neighbors_fn, source, target, directed=directed, spur_fn=spur_fn
    ):
        out.append((path, dist))
        if len(out) == k:
            break
    return out
