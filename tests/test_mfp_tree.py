"""Tests for Section 4: MinHash, LSH grouping and the MFP-tree."""
import random

import numpy as np
import pytest

from repro.core.mfp_tree import (
    MFPTree,
    MergedMFPTree,
    build_compressed_ep,
    compression_ratio,
    lsh_groups,
    minhash_signatures,
)


def _clustered_ep_sets(seed=0, n_edges=30, n_paths=40):
    """Edge -> path-id lists with three locality clusters (as bounding
    paths of nearby edges overlap heavily in a real subgraph)."""
    rnd = random.Random(seed)
    base = [f"P{i}" for i in range(n_paths)]
    out = {}
    for e in range(n_edges):
        cluster = e % 3
        ps = [p for i, p in enumerate(base) if i % 3 == cluster and rnd.random() < 0.75]
        if ps:
            out[("e", e)] = ps
    return out


class TestMinHash:
    def test_identical_sets_identical_signatures(self):
        sets = {"a": frozenset({1, 2, 3}), "b": frozenset({1, 2, 3})}
        sigs = minhash_signatures(sets, h=8, seed=0)
        assert sigs["a"] == sigs["b"]

    def test_signature_length(self):
        sigs = minhash_signatures({"a": frozenset({5})}, h=12, seed=0)
        assert len(sigs["a"]) == 12

    def test_estimates_jaccard(self):
        rng = np.random.default_rng(0)
        a = frozenset(int(x) for x in rng.choice(1000, 200, replace=False))
        b = frozenset(list(a)[:150] + [2000 + i for i in range(50)])
        true_j = len(a & b) / len(a | b)
        sigs = minhash_signatures({"a": a, "b": b}, h=256, seed=1)
        est = sum(x == y for x, y in zip(sigs["a"], sigs["b"])) / 256
        assert est == pytest.approx(true_j, abs=0.12)

    def test_empty_set_sentinel(self):
        sigs = minhash_signatures({"a": frozenset(), "b": frozenset({1})}, h=4, seed=0)
        assert sigs["a"] != sigs["b"]

    def test_invalid_h(self):
        with pytest.raises(ValueError):
            minhash_signatures({"a": frozenset({1})}, h=0)


class TestLSHGroups:
    def test_partition_property(self):
        sets = {i: frozenset({i, i + 1, i % 3}) for i in range(20)}
        sigs = minhash_signatures(sets, h=16, seed=2)
        groups = lsh_groups(sigs, bands=8)
        flat = [k for grp in groups for k in grp]
        assert sorted(flat) == sorted(sets)

    def test_identical_sets_grouped(self):
        sets = {"a": frozenset({1, 2}), "b": frozenset({1, 2}), "c": frozenset({99})}
        sigs = minhash_signatures(sets, h=16, seed=3)
        groups = lsh_groups(sigs, bands=4)
        grp_of = {k: i for i, grp in enumerate(groups) for k in grp}
        assert grp_of["a"] == grp_of["b"]

    def test_bands_must_divide_h(self):
        sigs = minhash_signatures({"a": frozenset({1})}, h=10, seed=0)
        with pytest.raises(ValueError):
            lsh_groups(sigs, bands=3)

    def test_empty(self):
        assert lsh_groups({}, bands=2) == []


class TestMFPTree:
    def test_roundtrip_single_edge(self):
        t = MFPTree()
        t.insert("e1", ["P1", "P2", "P3"])
        assert sorted(t.paths_covering("e1")) == ["P1", "P2", "P3"]

    def test_shared_prefix_not_duplicated(self):
        t = MFPTree()
        t.insert("e1", ["P1", "P2"])
        n_before = t.n_nodes
        t.insert("e2", ["P1", "P2", "P3"])
        # e2 reuses the (P1, P2) chain: only P3 + tail are new
        assert t.n_nodes == n_before + 2

    def test_prefix_may_start_below_root(self):
        # Unlike the classic FP-tree, the longest matching prefix may
        # begin at any node (Section 4.2).
        t = MFPTree()
        t.insert("e1", ["P9", "P1", "P2"])
        n_before = t.n_nodes
        t.insert("e2", ["P1", "P2"])
        assert t.n_nodes == n_before + 1  # only the e2 tail is new
        assert sorted(t.paths_covering("e2")) == ["P1", "P2"]

    def test_duplicate_edge_rejected(self):
        t = MFPTree()
        t.insert("e1", ["P1"])
        with pytest.raises(ValueError):
            t.insert("e1", ["P2"])

    def test_unknown_edge_empty(self):
        assert MFPTree().paths_covering("nope") == []

    def test_tail_records_set_size(self):
        t = MFPTree()
        t.insert("e1", ["P1", "P2", "P3", "P4"])
        assert len(t.paths_covering("e1")) == 4


class TestEndToEnd:
    @pytest.mark.parametrize("seed", range(4))
    def test_lossless_recovery(self, seed):
        ep = _clustered_ep_sets(seed)
        tree = build_compressed_ep(ep, h=16, bands=8, seed=seed)
        for e, ps in ep.items():
            assert sorted(tree.paths_covering(e)) == sorted(ps)

    def test_compresses_clustered_sets(self):
        ep = _clustered_ep_sets(1)
        tree = build_compressed_ep(ep, h=16, bands=8, seed=1)
        assert compression_ratio(ep, tree) > 1.2

    def test_merged_tree_node_count(self):
        ep = _clustered_ep_sets(2)
        tree = build_compressed_ep(ep, h=16, bands=8, seed=2)
        assert tree.n_nodes == 1 + sum(t.n_nodes for t in tree.trees)

    def test_unknown_edge_in_merged_tree(self):
        ep = _clustered_ep_sets(3)
        tree = build_compressed_ep(ep, h=16, bands=8, seed=3)
        assert tree.paths_covering(("e", 9999)) == []

    def test_on_real_ep_index(self):
        """Compress a real DTLP EP-Index and recover every covering set."""
        from repro.core import DTLP
        from repro.roadnet import random_connected_graph

        g = random_connected_graph(50, seed=4, extra_edge_frac=0.8)
        dtlp = DTLP.build(g, z=14, xi=3)
        ep_sets = {
            e: [tuple(bp.path) for bp in paths]
            for e, paths in dtlp.ep.items().items()
        }
        tree = build_compressed_ep(ep_sets, h=16, bands=8, seed=4)
        for e, ps in ep_sets.items():
            assert sorted(tree.paths_covering(e)) == sorted(ps)
