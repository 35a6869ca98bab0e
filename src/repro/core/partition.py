"""BFS graph partitioning into subgraphs and boundary vertices (Section 3.3).

The paper partitions G by traversing it breadth-first from any vertex,
producing subgraphs of at most ``z`` vertices that *share vertices but
not edges*: every edge belongs to exactly one subgraph, and a vertex
appearing in two or more subgraphs is a *boundary vertex* (Definition 5).

Concretely: *region-growing* BFS.  Repeatedly pick the first unassigned
vertex (in global BFS order) and grow a BFS ball over unassigned
vertices until it holds ``z`` of them; that ball is one *home* block.
Ball-shaped blocks keep the perimeter — and hence the boundary-vertex
count — near the O(sqrt(z)) minimum a road network allows; slicing raw
BFS discovery order into bands instead produces frontier-shaped blocks
whose perimeter is nearly their whole vertex set, which defeats the
index (the skeleton graph degenerates to almost all of G).

An edge is assigned to the smaller home-block id of its endpoints, and a
subgraph's vertex set is the union of its assigned edges' endpoints — so
a block adopts the foreign endpoints of its cross-block edges, which
then sit in two subgraphs and become boundary vertices.  A subgraph can
therefore slightly exceed ``z`` vertices (by its adopted endpoints); the
paper's construction has the same property since subgraphs overlap at
boundary vertices.
"""
from __future__ import annotations

from collections import deque
from dataclasses import dataclass, field
from typing import Dict, List, Set, Tuple

from ..roadnet.graph import Edge, Graph, Subgraph


@dataclass
class Partition:
    """Result of :func:`bfs_partition`: the set S = {SG_1..SG_n} plus lookups."""

    graph: Graph
    z: int
    subgraphs: List[Subgraph]
    boundary: Set[int]
    #: every subgraph id whose vertex set contains the vertex
    subgraphs_of_vertex: Dict[int, List[int]] = field(repr=False)
    #: the single subgraph id an edge was assigned to, keyed canonically
    subgraph_of_edge: Dict[Edge, int] = field(repr=False)
    #: BFS home block of each vertex (None if its block owned no edges);
    #: at most ``z`` vertices share a home block by construction
    home_block: Dict[int, int | None] = field(repr=False, default_factory=dict)

    @property
    def n_subgraphs(self) -> int:
        return len(self.subgraphs)

    def home_subgraphs(self, v: int) -> List[int]:
        return self.subgraphs_of_vertex.get(v, [])

    def is_boundary(self, v: int) -> bool:
        return v in self.boundary

    def boundary_of(self, sg_id: int) -> List[int]:
        """Boundary vertices inside subgraph ``sg_id`` (sorted for determinism)."""
        return sorted(
            v for v in self.subgraphs[sg_id].vertex_set if v in self.boundary
        )

    def n_subgraphs_with_boundary_over(self, threshold: int) -> int:
        """Count of subgraphs with more than ``threshold`` boundary vertices.

        Table 1 reports this for threshold 5 (column ``n_b > 5``).
        """
        return sum(
            1
            for i in range(self.n_subgraphs)
            if len(self.boundary_of(i)) > threshold
        )


def bfs_partition(graph: Graph, z: int, *, seed_vertex: int | None = None) -> Partition:
    """Partition ``graph`` into subgraphs of ~``z`` vertices via BFS.

    Deterministic: neighbors are visited in sorted order, components in
    ascending order of their smallest vertex.  ``seed_vertex`` overrides
    the starting vertex of the first BFS.
    """
    if z < 2:
        raise ValueError(f"z must be >= 2, got {z}")
    if graph.n_vertices == 0:
        raise ValueError("cannot partition an empty graph")

    # Global BFS order fixes the deterministic sweep in which region
    # seeds are chosen (and covers disconnected components).
    order: List[int] = []
    visited: Set[int] = set()
    all_vertices = sorted(graph.vertices)
    seeds = [seed_vertex] if seed_vertex is not None else []
    seeds += all_vertices
    for s in seeds:
        if s in visited:
            continue
        q = deque([s])
        visited.add(s)
        while q:
            u = q.popleft()
            order.append(u)
            for v in sorted(n for n, _ in graph.neighbors(u)):
                if v not in visited:
                    visited.add(v)
                    q.append(v)

    # Region growing: BFS balls of up to z unassigned vertices.
    home: Dict[int, int] = {}
    n_blocks = 0
    for s in order:
        if s in home:
            continue
        block = n_blocks
        n_blocks += 1
        q = deque([s])
        home[s] = block
        count = 1
        while q and count < z:
            u = q.popleft()
            for v in sorted(n for n, _ in graph.neighbors(u)):
                if v not in home:
                    home[v] = block
                    q.append(v)
                    count += 1
                    if count == z:
                        break

    edge_lists: List[List[Edge]] = [[] for _ in range(n_blocks)]
    subgraph_of_edge: Dict[Edge, int] = {}
    for e in graph.edges():
        u, v = e
        owner = min(home[u], home[v])
        edge_lists[owner].append(e)
        subgraph_of_edge[e] = owner

    # Isolated vertices (degree 0) produce no edges; their home block may
    # end up empty.  Drop empty blocks but keep ids compact.
    subgraphs: List[Subgraph] = []
    remap: Dict[int, int] = {}
    for block, edges in enumerate(edge_lists):
        if not edges:
            continue
        remap[block] = len(subgraphs)
        subgraphs.append(Subgraph(graph, len(subgraphs), edges))
    subgraph_of_edge = {e: remap[b] for e, b in subgraph_of_edge.items()}

    subgraphs_of_vertex: Dict[int, List[int]] = {}
    for sg in subgraphs:
        for v in sg.vertex_set:
            subgraphs_of_vertex.setdefault(v, []).append(sg.sg_id)
    boundary = {v for v, sgs in subgraphs_of_vertex.items() if len(sgs) >= 2}

    return Partition(
        graph=graph,
        z=z,
        subgraphs=subgraphs,
        boundary=boundary,
        subgraphs_of_vertex=subgraphs_of_vertex,
        subgraph_of_edge=subgraph_of_edge,
        home_block={v: remap.get(home[v]) for v in order},
    )
