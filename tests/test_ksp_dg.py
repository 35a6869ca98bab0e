"""End-to-end correctness of KSP-DG against the networkx exact oracle.

These are the paper's headline correctness claims (Theorem 3): the
filter-and-refine loop returns exactly the k shortest loopless paths,
for boundary and non-boundary endpoints, before and after weight
changes, across graph shapes and k values.
"""
import random

import pytest

from repro.core import DTLP, ksp_dg, ksp_dg_batch
from repro.roadnet import (
    apply_deltas,
    grid_road_network,
    random_connected_graph,
    snapshot_deltas,
)

from ._utils import nx_ksp_dists, round_dists, to_nx


def _check_query(g, dtlp, s, t, k):
    res = ksp_dg(dtlp, s, t, k)
    got = round_dists(res.paths)
    exp = [round(d, 6) for d in nx_ksp_dists(to_nx(g), s, t, k)]
    assert got == exp, f"q({s},{t}) k={k}: {got} != {exp}"
    for path, dist in res.paths:
        assert path[0] == s and path[-1] == t
        assert len(set(path)) == len(path), f"non-simple path {path}"
    return res


class TestExactnessRandomGraphs:
    @pytest.mark.parametrize("seed", range(8))
    @pytest.mark.parametrize("k", [1, 2, 4])
    def test_static_graph(self, seed, k):
        g = random_connected_graph(50, seed=seed, extra_edge_frac=0.9)
        dtlp = DTLP.build(g, z=14, xi=5)
        rnd = random.Random(seed)
        s, t = rnd.sample(range(50), 2)
        _check_query(g, dtlp, s, t, k)

    @pytest.mark.parametrize("seed", range(8))
    def test_after_weight_changes(self, seed):
        g = random_connected_graph(50, seed=seed, extra_edge_frac=0.9)
        dtlp = DTLP.build(g, z=14, xi=5)
        dtlp.update(snapshot_deltas(g, alpha=0.5, tau=0.4, seed=seed + 77))
        rnd = random.Random(seed + 1)
        s, t = rnd.sample(range(50), 2)
        _check_query(g, dtlp, s, t, 3)

    @pytest.mark.parametrize("snapshots", [1, 3])
    def test_across_multiple_snapshots(self, snapshots):
        g = random_connected_graph(40, seed=3, extra_edge_frac=0.8)
        dtlp = DTLP.build(g, z=12, xi=5)
        for i in range(snapshots):
            dtlp.update(snapshot_deltas(g, alpha=0.4, tau=0.3, seed=i))
            _check_query(g, dtlp, 0, 39, 2)


class TestExactnessRoadNetworks:
    @pytest.mark.parametrize("k", [1, 2, 4])
    def test_grid_network(self, k):
        g = grid_road_network(12, 12, seed=5)
        apply_deltas(g, snapshot_deltas(g, alpha=0.35, tau=0.30, seed=6))
        dtlp = DTLP.build(g, z=30, xi=8)
        rnd = random.Random(k)
        for _ in range(3):
            s, t = rnd.sample(sorted(g.vertices), 2)
            _check_query(g, dtlp, s, t, k)


class TestEndpointKinds:
    @pytest.fixture(scope="class")
    def built(self):
        g = random_connected_graph(60, seed=9, extra_edge_frac=0.9)
        apply_deltas(g, snapshot_deltas(g, alpha=0.4, tau=0.3, seed=10))
        return g, DTLP.build(g, z=15, xi=5)

    def test_both_boundary(self, built):
        g, dtlp = built
        b = sorted(dtlp.partition.boundary)
        _check_query(g, dtlp, b[0], b[-1], 3)

    def test_both_non_boundary(self, built):
        g, dtlp = built
        nb = sorted(set(g.vertices) - dtlp.partition.boundary)
        _check_query(g, dtlp, nb[0], nb[-1], 3)

    def test_mixed(self, built):
        g, dtlp = built
        b = sorted(dtlp.partition.boundary)
        nb = sorted(set(g.vertices) - dtlp.partition.boundary)
        _check_query(g, dtlp, nb[0], b[-1], 3)

    def test_same_subgraph_pair(self, built):
        g, dtlp = built
        sg0 = dtlp.partition.subgraphs[0]
        verts = sorted(sg0.vertex_set)
        _check_query(g, dtlp, verts[0], verts[-1], 2)

    def test_source_equals_target(self, built):
        g, dtlp = built
        res = ksp_dg(dtlp, 5, 5, 3)
        assert res.paths == [([5], 0.0)]

    def test_adjacent_vertices(self, built):
        g, dtlp = built
        u, v = next(iter(g.edges()))
        _check_query(g, dtlp, u, v, 3)


class TestEdgeCases:
    def test_single_subgraph_graph(self):
        g = random_connected_graph(25, seed=11)
        dtlp = DTLP.build(g, z=500, xi=3)
        assert dtlp.partition.n_subgraphs == 1
        _check_query(g, dtlp, 0, 24, 3)

    def test_disconnected_pair_returns_empty(self):
        from repro.roadnet import Graph

        g = Graph()
        g.add_edge(0, 1, 1)
        g.add_edge(1, 2, 2)
        g.add_edge(5, 6, 1)
        dtlp = DTLP.build(g, z=2, xi=2)
        assert ksp_dg(dtlp, 0, 6, 2).paths == []

    def test_k_larger_than_path_count(self):
        from repro.roadnet import Graph

        g = Graph()
        g.add_edge(0, 1, 1)
        g.add_edge(1, 2, 1)
        dtlp = DTLP.build(g, z=2, xi=2)
        res = ksp_dg(dtlp, 0, 2, 10)
        assert len(res.paths) == 1

    def test_invalid_k(self):
        g = random_connected_graph(10, seed=0)
        dtlp = DTLP.build(g, z=5, xi=2)
        with pytest.raises(ValueError):
            ksp_dg(dtlp, 0, 5, 0)

    def test_max_iterations_caps_work(self):
        g = random_connected_graph(50, seed=12, extra_edge_frac=1.0)
        apply_deltas(g, snapshot_deltas(g, alpha=0.8, tau=0.8, seed=13))
        dtlp = DTLP.build(g, z=12, xi=2)
        res = ksp_dg(dtlp, 0, 49, 4, max_iterations=2)
        assert res.n_iterations <= 2


class TestCountersAndBatch:
    def test_iterations_grow_with_k_on_average(self):
        g = grid_road_network(10, 10, seed=14)
        apply_deltas(g, snapshot_deltas(g, alpha=0.35, tau=0.3, seed=15))
        dtlp = DTLP.build(g, z=25, xi=6)
        rnd = random.Random(0)
        queries = [tuple(rnd.sample(sorted(g.vertices), 2)) for _ in range(6)]
        mean = {
            k: sum(ksp_dg(dtlp, s, t, k).n_iterations for s, t in queries) / 6
            for k in (1, 6)
        }
        assert mean[6] >= mean[1]

    def test_cache_reduces_partial_tasks(self):
        g = random_connected_graph(60, seed=16, extra_edge_frac=0.9)
        apply_deltas(g, snapshot_deltas(g, alpha=0.5, tau=0.5, seed=17))
        dtlp = DTLP.build(g, z=15, xi=3)
        res = ksp_dg(dtlp, 1, 58, 4)
        if res.n_iterations > 2:
            assert res.cache_hits > 0

    def test_batch_matches_individual(self):
        g = random_connected_graph(40, seed=18, extra_edge_frac=0.8)
        dtlp = DTLP.build(g, z=12, xi=4)
        queries = [(0, 39), (5, 30), (11, 22)]
        batch = ksp_dg_batch(dtlp, queries, 2)
        for res, (s, t) in zip(batch, queries):
            solo = ksp_dg(dtlp, s, t, 2)
            assert round_dists(res.paths) == round_dists(solo.paths)
