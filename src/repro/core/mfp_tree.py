"""Section 4: compressing the EP-Index with LSH grouping + MFP-trees.

The EP-Index duplicates each bounding path once per edge it covers
(``N_b(N_b-1)/2 * xi * n_e`` elements), so the paper compresses it:

1. **PE-Matrix** — paths as rows, edges as columns, 1 iff the path
   covers the edge (Figure 10).
2. **MinHash signatures** — ``h`` hash functions estimate the Jaccard
   similarity between the path sets of two edges without materializing
   intersections (Figure 11).
3. **LSH banding** — the signature rows are split into ``b`` bands of
   ``h/b`` integers; edges colliding in at least one band land in the
   same group, so grouped edges likely share many covering paths.
4. **MFP-tree** — per group, each edge's (occurrence-ranked) path list
   plus the edge as *tail node* is inserted under the longest matching
   prefix — which, unlike the classic FP-tree [16], may start at *any*
   node, not only the root.  The tail node records ``|P|`` so the
   covering set is recovered by walking up ``|P|`` steps (Figure 12).
5. Per-subgraph group trees are merged under one empty root (Figure 13).

The structure is exercised for (a) lossless recovery — the covering set
read out of the tree equals the EP-Index list — and (b) compression —
node count below the raw element count on locality-clustered path sets.
"""
from __future__ import annotations

from collections import Counter, defaultdict
from dataclasses import dataclass, field
from typing import Dict, FrozenSet, Hashable, List, Optional, Sequence, Tuple

import numpy as np

_MERSENNE = (1 << 61) - 1


def minhash_signatures(
    sets: Dict[Hashable, FrozenSet[int]], h: int, *, seed: int = 0
) -> Dict[Hashable, Tuple[int, ...]]:
    """MinHash signature (length ``h``) of each key's integer set.

    Uses ``h`` independent universal hash functions ``(a*x + b) mod p``.
    An empty set gets the all-``p`` signature (never collides with a
    non-empty one).
    """
    if h < 1:
        raise ValueError(f"h must be >= 1, got {h}")
    rng = np.random.default_rng(seed)
    a = rng.integers(1, _MERSENNE, size=h, dtype=np.int64)
    b = rng.integers(0, _MERSENNE, size=h, dtype=np.int64)
    out: Dict[Hashable, Tuple[int, ...]] = {}
    for key, s in sets.items():
        if not s:
            out[key] = tuple([_MERSENNE] * h)
            continue
        xs = np.fromiter(s, dtype=np.int64)
        # (a*x + b) % p per hash function; min over the set.
        sig = ((np.outer(a, xs) + b[:, None]) % _MERSENNE).min(axis=1)
        out[key] = tuple(int(v) for v in sig)
    return out


def lsh_groups(
    signatures: Dict[Hashable, Tuple[int, ...]], bands: int
) -> List[List[Hashable]]:
    """Group keys whose signatures collide in at least one LSH band.

    Band collisions are merged transitively (union-find), so each key
    appears in exactly one group.  ``h`` must be divisible by ``bands``.
    """
    if not signatures:
        return []
    h = len(next(iter(signatures.values())))
    if bands < 1 or h % bands:
        raise ValueError(f"bands={bands} must divide signature length {h}")
    rows = h // bands
    keys = list(signatures)
    parent = {k: k for k in keys}

    def find(x):
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    buckets: Dict[Tuple[int, Tuple[int, ...]], Hashable] = {}
    for k in keys:
        sig = signatures[k]
        for bi in range(bands):
            band = (bi, sig[bi * rows : (bi + 1) * rows])
            if band in buckets:
                ra, rb = find(buckets[band]), find(k)
                if ra != rb:
                    parent[ra] = rb
            else:
                buckets[band] = k
    groups: Dict[Hashable, List[Hashable]] = defaultdict(list)
    for k in keys:
        groups[find(k)].append(k)
    return [sorted(g, key=repr) for g in groups.values()]


@dataclass
class _Node:
    label: Optional[Hashable]
    parent: Optional["_Node"]
    children: Dict[Hashable, "_Node"] = field(default_factory=dict)
    #: set on tail nodes: size of the path set ending here
    tail_count: Optional[int] = None


class MFPTree:
    """A modified FP-tree over one LSH group of edges.

    Insertion finds the longest matching prefix of the node sequence
    ``[p_0 .. p_l, edge]`` — starting from *any* node (first found wins,
    as in the paper) — and appends the remainder there.
    """

    def __init__(self) -> None:
        self.root = _Node(label=None, parent=None)
        self._label_index: Dict[Hashable, List[_Node]] = defaultdict(list)
        self._tail_of_edge: Dict[Hashable, _Node] = {}
        self.n_nodes = 0

    def _new_node(self, label: Hashable, parent: _Node) -> _Node:
        node = _Node(label=label, parent=parent)
        parent.children[label] = node
        self._label_index[label].append(node)
        self.n_nodes += 1
        return node

    def _longest_prefix(self, seq: Sequence[Hashable]) -> Tuple[_Node, int]:
        """Deepest chain matching a prefix of ``seq``; may start anywhere."""
        best: Tuple[_Node, int] = (self.root, 0)
        for start in self._label_index.get(seq[0], []):
            node, matched = start, 1
            while matched < len(seq) and seq[matched] in node.children:
                node = node.children[seq[matched]]
                matched += 1
            if matched > best[1]:
                best = (node, matched)
                if matched == len(seq):
                    break
        return best

    def insert(self, edge: Hashable, ranked_paths: Sequence[Hashable]) -> None:
        """Insert edge ``edge`` with its occurrence-ranked covering paths."""
        if edge in self._tail_of_edge:
            raise ValueError(f"edge {edge!r} already inserted")
        seq: List[Hashable] = list(ranked_paths) + [edge]
        node, matched = self._longest_prefix(seq)
        for label in seq[matched:]:
            node = self._new_node(label, node)
        node.tail_count = len(ranked_paths)
        self._tail_of_edge[edge] = node

    def paths_covering(self, edge: Hashable) -> List[Hashable]:
        """Walk up ``|P|`` steps from the edge's tail node (Section 4.2)."""
        tail = self._tail_of_edge.get(edge)
        if tail is None:
            return []
        out: List[Hashable] = []
        node = tail.parent
        for _ in range(tail.tail_count or 0):
            assert node is not None and node.label is not None
            out.append(node.label)
            node = node.parent
        return out

    @property
    def edges(self) -> List[Hashable]:
        return list(self._tail_of_edge)


class MergedMFPTree:
    """``T_e``: per-group MFP-trees merged under one empty root (Fig. 13)."""

    def __init__(self, trees: List[MFPTree]) -> None:
        self.trees = trees
        self._tree_of_edge: Dict[Hashable, MFPTree] = {}
        for t in trees:
            for e in t.edges:
                self._tree_of_edge[e] = t

    def paths_covering(self, edge: Hashable) -> List[Hashable]:
        t = self._tree_of_edge.get(edge)
        return t.paths_covering(edge) if t else []

    @property
    def n_nodes(self) -> int:
        # +1 for the shared empty root r.
        return 1 + sum(t.n_nodes for t in self.trees)


def build_compressed_ep(
    ep_sets: Dict[Hashable, Sequence[Hashable]],
    *,
    h: int = 16,
    bands: int = 8,
    seed: int = 0,
) -> MergedMFPTree:
    """End-to-end Section 4: EP-Index sets -> LSH groups -> merged MFP-tree.

    ``ep_sets[edge]`` is the list of path ids covering ``edge``.  Path
    ids must be hashable; integers hash best for MinHash.
    """
    frozen = {e: frozenset(hash(p) & 0x7FFFFFFF for p in ps) for e, ps in ep_sets.items()}
    sigs = minhash_signatures(frozen, h, seed=seed)
    groups = lsh_groups(sigs, bands)
    # Global occurrence ranking (descending), ties broken deterministically.
    occurrence: Counter = Counter()
    for ps in ep_sets.values():
        occurrence.update(ps)
    trees: List[MFPTree] = []
    for group in groups:
        tree = MFPTree()
        for edge in group:
            ranked = sorted(
                ep_sets[edge], key=lambda p: (-occurrence[p], repr(p))
            )
            tree.insert(edge, ranked)
        trees.append(tree)
    return MergedMFPTree(trees)


def compression_ratio(
    ep_sets: Dict[Hashable, Sequence[Hashable]], tree: MergedMFPTree
) -> float:
    """Raw EP-Index elements divided by merged-tree nodes (>1 = smaller)."""
    raw = sum(len(ps) + 1 for ps in ep_sets.values())  # +1: the edge key
    return raw / max(1, tree.n_nodes)
