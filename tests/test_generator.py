"""Tests for the synthetic road-network generator (DIMACS stand-ins)."""
import networkx as nx
import pytest

from repro.roadnet import (
    DATASETS,
    grid_road_network,
    load_dataset,
    random_connected_graph,
)

from ._utils import to_nx


class TestGridRoadNetwork:
    def test_connected(self):
        g = grid_road_network(12, 12, seed=0)
        assert nx.is_connected(to_nx(g))

    @pytest.mark.parametrize("seed", range(5))
    def test_connected_many_seeds(self, seed):
        assert nx.is_connected(to_nx(grid_road_network(8, 8, seed=seed)))

    def test_vertex_count(self):
        g = grid_road_network(10, 10, seed=1)
        assert g.n_vertices == 100

    def test_sparse_like_road_network(self):
        g = grid_road_network(20, 20, seed=2)
        avg_degree = 2 * g.n_edges / g.n_vertices
        assert 2.0 <= avg_degree <= 4.5  # DIMACS road networks ~2.5-2.8

    def test_deterministic(self):
        a = grid_road_network(8, 8, seed=5)
        b = grid_road_network(8, 8, seed=5)
        assert sorted(a.edges()) == sorted(b.edges())
        assert all(a.weight(*e) == b.weight(*e) for e in a.edges())

    def test_seeds_differ(self):
        a = grid_road_network(8, 8, seed=1)
        b = grid_road_network(8, 8, seed=2)
        assert sorted(a.edges()) != sorted(b.edges())

    def test_integer_weights_in_range(self):
        g = grid_road_network(10, 10, seed=3, max_w0=50)
        for e in g.edges():
            w0 = g.init_weight(*e)
            assert isinstance(w0, int) and 1 <= w0 <= 50

    def test_too_small_rejected(self):
        with pytest.raises(ValueError):
            grid_road_network(1, 5)

    def test_directed_has_both_directions(self):
        g = grid_road_network(6, 6, seed=4, directed=True)
        for u, v in list(g.edges())[:20]:
            assert g.has_edge(v, u)


class TestDatasets:
    @pytest.mark.parametrize("name", list(DATASETS))
    def test_loadable_and_connected(self, name):
        g = load_dataset(name)
        assert nx.is_connected(to_nx(g))

    def test_sizes_ordered_like_paper(self):
        # Paper Table 1: NY < COL < FLA < CUSA.
        sizes = [load_dataset(n).n_vertices for n in ("NY", "COL", "FLA", "CUSA")]
        assert sizes == sorted(sizes) and len(set(sizes)) == 4

    def test_unknown_dataset(self):
        with pytest.raises(KeyError):
            load_dataset("MOON")


class TestRandomConnectedGraph:
    @pytest.mark.parametrize("seed", range(5))
    def test_connected(self, seed):
        g = random_connected_graph(40, seed=seed)
        assert nx.is_connected(to_nx(g))

    def test_deterministic(self):
        a = random_connected_graph(30, seed=9)
        b = random_connected_graph(30, seed=9)
        assert sorted(a.edges()) == sorted(b.edges())

    def test_extra_edges(self):
        g = random_connected_graph(50, seed=0, extra_edge_frac=1.0)
        assert g.n_edges == 49 + 50

    def test_directed(self):
        g = random_connected_graph(20, seed=1, directed=True)
        assert g.directed
        u, v = next(iter(g.edges()))
        assert g.has_edge(v, u)

    def test_too_small(self):
        with pytest.raises(ValueError):
            random_connected_graph(1)
