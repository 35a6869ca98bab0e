"""Tests for the FindKSP and CANDS baselines (and their paper-shape
relationships with DTLP maintenance cost)."""
import random

import pytest

from repro.baselines import CANDS, find_ksp
from repro.core import DTLP, bfs_partition, shortest_path, yen_ksp
from repro.roadnet import (
    apply_deltas,
    grid_road_network,
    random_connected_graph,
    snapshot_deltas,
)

from ._utils import nx_ksp_dists, round_dists, to_nx


class TestFindKSP:
    @pytest.mark.parametrize("seed", range(8))
    @pytest.mark.parametrize("k", [1, 3, 6])
    def test_matches_networkx(self, seed, k):
        g = random_connected_graph(40, seed=seed, extra_edge_frac=0.9)
        got = round_dists(find_ksp(g.neighbors, 2, 35, k))
        exp = [round(d, 6) for d in nx_ksp_dists(to_nx(g), 2, 35, k)]
        assert got == exp

    @pytest.mark.parametrize("seed", range(4))
    def test_matches_yen_paths_exactly(self, seed):
        g = random_connected_graph(35, seed=seed, extra_edge_frac=0.8)
        apply_deltas(g, snapshot_deltas(g, alpha=0.5, tau=0.4, seed=seed + 5))
        a = find_ksp(g.neighbors, 0, 30, 5)
        b = yen_ksp(g.neighbors, 0, 30, 5)
        assert round_dists(a) == round_dists(b)

    def test_unreachable(self):
        from repro.roadnet import Graph

        g = Graph()
        g.add_edge(0, 1, 1)
        g.add_edge(2, 3, 1)
        assert find_ksp(g.neighbors, 0, 3, 2) == []

    def test_invalid_k(self):
        g = random_connected_graph(10, seed=0)
        with pytest.raises(ValueError):
            find_ksp(g.neighbors, 0, 5, 0)

    def test_directed(self):
        g = random_connected_graph(25, seed=1, directed=True)

        def rev(u):
            for v in g.vertices:
                if g.has_edge(v, u):
                    yield v, g.weight(v, u)

        got = round_dists(find_ksp(g.neighbors, 0, 20, 3, directed_reverse_fn=rev))
        exp = [round(d, 6) for d in nx_ksp_dists(to_nx(g), 0, 20, 3)]
        assert got == exp


class TestCANDS:
    @pytest.fixture(scope="class")
    def built(self):
        g = random_connected_graph(60, seed=3, extra_edge_frac=0.9)
        apply_deltas(g, snapshot_deltas(g, alpha=0.4, tau=0.3, seed=4))
        return g, CANDS.build(g, z=15)

    @pytest.mark.parametrize("q", [(0, 59), (7, 44), (23, 51), (2, 9)])
    def test_sssp_distance_exact(self, built, q):
        g, cands = built
        s, t = q
        exp = shortest_path(g.neighbors, s, t)
        got = cands.shortest_path(s, t)
        assert got[1] == pytest.approx(exp[1])

    def test_path_is_valid_in_graph(self, built):
        g, cands = built
        path, dist = cands.shortest_path(0, 59)
        total = sum(g.weight(a, b) for a, b in zip(path, path[1:]))
        assert total == pytest.approx(dist)
        assert path[0] == 0 and path[-1] == 59

    def test_trivial_query(self, built):
        g, cands = built
        assert cands.shortest_path(4, 4) == ([4], 0.0)

    def test_exact_after_maintenance(self, built):
        g, cands = built
        stats = cands.update(snapshot_deltas(g, alpha=0.5, tau=0.5, seed=8))
        assert stats.n_subgraphs_recomputed > 0
        for s, t in [(0, 59), (11, 40)]:
            exp = shortest_path(g.neighbors, s, t)
            got = cands.shortest_path(s, t)
            assert got[1] == pytest.approx(exp[1])

    def test_boundary_endpoints(self, built):
        g, cands = built
        b = sorted(cands.partition.boundary)
        s, t = b[0], b[-1]
        assert cands.shortest_path(s, t)[1] == pytest.approx(
            shortest_path(g.neighbors, s, t)[1]
        )

    def test_disconnected_returns_none(self):
        from repro.roadnet import Graph

        g = Graph()
        g.add_edge(0, 1, 1)
        g.add_edge(5, 6, 1)
        cands = CANDS.build(g, z=2)
        assert cands.shortest_path(0, 6) is None


class TestPaperShape:
    """The relationships Figures 40-41 report: CANDS maintenance is much
    more expensive than DTLP's, because its index contents depend on the
    current weights while DTLP's bounding-path routes never change."""

    def test_cands_recomputes_dtlp_shifts(self):
        g = grid_road_network(12, 12, seed=5)
        part = bfs_partition(g, z=30)
        dtlp = DTLP.build(g.copy(), z=30, xi=4)
        cands = CANDS(g, part)
        deltas = snapshot_deltas(g, alpha=0.5, tau=0.5, seed=6)
        c_stats = cands.update(deltas, apply_to_graph=False)
        d_stats = dtlp.update(deltas)
        # CANDS redoes Dijkstra all-pairs work in every affected
        # subgraph; DTLP only shifts distances and re-sorts unit weights.
        assert c_stats.n_pairs_recomputed > 0
        assert d_stats.n_subgraphs_refreshed == c_stats.n_subgraphs_recomputed
