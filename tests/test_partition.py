"""Tests for BFS partitioning and boundary vertices (Section 3.3)."""
import pytest

from repro.core import bfs_partition
from repro.roadnet import Graph, grid_road_network, random_connected_graph


@pytest.fixture(params=[0, 1, 2])
def part(request):
    g = random_connected_graph(80, seed=request.param)
    return bfs_partition(g, z=20)


class TestPartitionInvariants:
    def test_every_edge_in_exactly_one_subgraph(self, part):
        seen = {}
        for sg in part.subgraphs:
            for e in sg.edge_list:
                assert e not in seen, f"edge {e} in subgraphs {seen[e]} and {sg.sg_id}"
                seen[e] = sg.sg_id
        assert set(seen) == set(part.graph.edges())

    def test_vertex_union_covers_graph(self, part):
        union = set()
        for sg in part.subgraphs:
            union |= sg.vertex_set
        assert union == set(part.graph.vertices)

    def test_boundary_iff_in_multiple_subgraphs(self, part):
        for v in part.graph.vertices:
            n_homes = len(part.home_subgraphs(v))
            assert (v in part.boundary) == (n_homes >= 2)

    def test_non_boundary_in_exactly_one_subgraph(self, part):
        for v in part.graph.vertices:
            if not part.is_boundary(v):
                assert len(part.home_subgraphs(v)) == 1

    def test_subgraph_of_edge_consistent(self, part):
        for e, sg_id in part.subgraph_of_edge.items():
            assert e in set(part.subgraphs[sg_id].edge_list)

    def test_vertex_cap_respected_up_to_adoption(self, part):
        # at most z vertices of a subgraph have it as their home block;
        # the rest are adopted endpoints of cross edges (module docstring).
        for sg in part.subgraphs:
            own = {v for v in sg.vertex_set if part.home_block.get(v) == sg.sg_id}
            assert len(own) <= part.z

    def test_boundary_of_sorted_and_member(self, part):
        for sg in part.subgraphs:
            b = part.boundary_of(sg.sg_id)
            assert b == sorted(b)
            assert set(b) <= sg.vertex_set


class TestPartitionShapes:
    def test_z_larger_than_graph_single_subgraph(self):
        g = random_connected_graph(30, seed=3)
        p = bfs_partition(g, z=1000)
        assert p.n_subgraphs == 1
        assert p.boundary == set()

    @pytest.mark.parametrize("z", [10, 25, 50])
    def test_smaller_z_more_subgraphs(self, z):
        g = grid_road_network(16, 16, seed=0)
        p = bfs_partition(g, z)
        assert p.n_subgraphs >= (g.n_vertices // z)

    def test_skeleton_shrinks_with_growing_z(self):
        # The Table 3 trend: larger z => fewer boundary vertices.
        g = grid_road_network(20, 20, seed=1)
        sizes = [len(bfs_partition(g, z).boundary) for z in (20, 50, 120)]
        assert sizes[0] > sizes[1] > sizes[2]

    def test_disconnected_graph_partitioned(self):
        g = Graph()
        g.add_edge(0, 1, 1)
        g.add_edge(1, 2, 1)
        g.add_edge(10, 11, 1)
        p = bfs_partition(g, z=2)
        covered = set()
        for sg in p.subgraphs:
            covered |= set(sg.edge_list)
        assert covered == set(g.edges())

    def test_invalid_z(self):
        g = random_connected_graph(10, seed=0)
        with pytest.raises(ValueError):
            bfs_partition(g, z=1)

    def test_empty_graph_rejected(self):
        with pytest.raises(ValueError):
            bfs_partition(Graph(), z=5)

    def test_deterministic(self):
        g = random_connected_graph(60, seed=4)
        p1 = bfs_partition(g, z=15)
        p2 = bfs_partition(g, z=15)
        assert [sorted(sg.edge_list) for sg in p1.subgraphs] == [
            sorted(sg.edge_list) for sg in p2.subgraphs
        ]

    def test_seed_vertex_respected(self):
        g = random_connected_graph(60, seed=5)
        p = bfs_partition(g, z=15, seed_vertex=42)
        # vertex 42 is discovered first, so it lives in subgraph 0
        assert 0 in p.home_subgraphs(42)

    def test_nb_gt5_counter(self):
        g = grid_road_network(16, 16, seed=2)
        p = bfs_partition(g, z=30)
        manual = sum(1 for i in range(p.n_subgraphs) if len(p.boundary_of(i)) > 5)
        assert p.n_subgraphs_with_boundary_over(5) == manual
