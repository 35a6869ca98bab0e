"""Tests for bounding paths, vfrags, bound/lower-bound distances (3.4-3.5).

The load-bearing invariant (everything in Sections 5.1/5.4 rests on it):
for any pair of boundary vertices, under ANY weight assignment, the
lower bound distance never exceeds the true shortest distance inside the
subgraph.
"""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import (
    UnitWeightIndex,
    bounding_paths,
    build_subgraph_index,
    lower_bound_distance,
    shortest_path,
)
from repro.core.partition import bfs_partition
from repro.roadnet import (
    Graph,
    Subgraph,
    apply_deltas,
    random_connected_graph,
    snapshot_deltas,
)


def _whole_graph_sg(g: Graph) -> Subgraph:
    return Subgraph(g, 0, list(g.edges()))


class TestUnitWeightIndex:
    def test_paper_example_4(self):
        """Example 4: unit weights (1/3,3),(1/2,4),(1,8),(2,3) => BD(8)=4."""
        g = Graph()
        g.add_edge(0, 1, 3, w=1.0)   # unit 1/3, 3 vfrags
        g.add_edge(1, 2, 4, w=2.0)   # unit 1/2, 4 vfrags
        g.add_edge(2, 3, 8, w=8.0)   # unit 1,   8 vfrags
        g.add_edge(3, 0, 3, w=6.0)   # unit 2,   3 vfrags
        uw = UnitWeightIndex(_whole_graph_sg(g))
        assert uw.total_vfrags == 18
        assert uw.bd(8) == pytest.approx(3 * (1 / 3) + 4 * (1 / 2) + 1 * 1)

    def test_bd_zero(self):
        g = Graph()
        g.add_edge(0, 1, 2)
        uw = UnitWeightIndex(_whole_graph_sg(g))
        assert uw.bd(0) == 0.0

    def test_bd_full_equals_total_weight(self):
        g = random_connected_graph(20, seed=0)
        sg = _whole_graph_sg(g)
        uw = UnitWeightIndex(sg)
        total_w = sum(g.weight(*e) for e in g.edges())
        assert uw.bd(uw.total_vfrags) == pytest.approx(total_w)

    def test_bd_monotone_in_phi(self):
        g = random_connected_graph(15, seed=1)
        uw = UnitWeightIndex(_whole_graph_sg(g))
        vals = [uw.bd(p) for p in range(uw.total_vfrags + 1)]
        assert vals == sorted(vals)

    def test_bd_brute_force(self):
        g = random_connected_graph(12, seed=2)
        apply_deltas(g, snapshot_deltas(g, alpha=1.0, tau=0.5, seed=3))
        sg = _whole_graph_sg(g)
        uw = UnitWeightIndex(sg)
        frags = []
        for u, v in sg.edge_list:
            frags += [g.unit_weight(u, v)] * g.init_weight(u, v)
        frags.sort()
        for phi in (1, 3, 7, len(frags)):
            assert uw.bd(phi) == pytest.approx(sum(frags[:phi]))

    def test_bd_overflow_raises(self):
        g = Graph()
        g.add_edge(0, 1, 2)
        uw = UnitWeightIndex(_whole_graph_sg(g))
        with pytest.raises(ValueError):
            uw.bd(3)

    def test_bd_negative_raises(self):
        g = Graph()
        g.add_edge(0, 1, 2)
        with pytest.raises(ValueError):
            UnitWeightIndex(_whole_graph_sg(g)).bd(-1)


class TestBoundingPaths:
    def test_phi_is_initial_weight_sum(self):
        g = random_connected_graph(25, seed=4)
        sg = _whole_graph_sg(g)
        for bp in bounding_paths(sg, 0, 20, xi=3).paths:
            assert bp.phi == sum(
                g.init_weight(a, b) for a, b in zip(bp.path, bp.path[1:])
            )

    def test_distinct_ascending_phi_capped_at_xi(self):
        g = random_connected_graph(25, seed=5, extra_edge_frac=1.0)
        sg = _whole_graph_sg(g)
        bset = bounding_paths(sg, 0, 20, xi=4)
        phis = sorted({bp.phi for bp in bset.paths})
        assert len(phis) <= 4
        assert [bp.phi for bp in bset.paths] == sorted(bp.phi for bp in bset.paths)
        assert bset.complete

    def test_route_insensitive_to_weight_changes(self):
        """The paper's key claim: bounding paths never change with traffic."""
        g = random_connected_graph(25, seed=6, extra_edge_frac=1.0)
        sg = _whole_graph_sg(g)
        before = sorted(bp.path for bp in bounding_paths(sg, 0, 20, xi=3).paths)
        apply_deltas(g, snapshot_deltas(g, alpha=1.0, tau=0.9, seed=7))
        after = sorted(bp.path for bp in bounding_paths(sg, 0, 20, xi=3).paths)
        assert before == after

    def test_dist_is_current_distance(self):
        g = random_connected_graph(25, seed=8)
        apply_deltas(g, snapshot_deltas(g, alpha=1.0, tau=0.4, seed=9))
        sg = _whole_graph_sg(g)
        for bp in bounding_paths(sg, 0, 20, xi=2).paths:
            assert bp.dist == pytest.approx(
                sum(g.weight(a, b) for a, b in zip(bp.path, bp.path[1:]))
            )

    def test_unreachable_pair_empty(self):
        g = Graph()
        g.add_edge(0, 1, 1)
        g.add_edge(2, 3, 1)
        sg = _whole_graph_sg(g)
        assert bounding_paths(sg, 0, 3, xi=2).paths == []

    def test_xi_one_takes_fewest_vfrag_path(self):
        g = Graph()
        g.add_edge(0, 1, 1)
        g.add_edge(1, 2, 1)
        g.add_edge(0, 2, 5)
        sg = _whole_graph_sg(g)
        bset = bounding_paths(sg, 0, 2, xi=1)
        assert len(bset.paths) == 1
        assert bset.paths[0].path == (0, 1, 2) and bset.paths[0].phi == 2

    def test_invalid_xi(self):
        g = random_connected_graph(10, seed=0)
        with pytest.raises(ValueError):
            bounding_paths(_whole_graph_sg(g), 0, 5, xi=0)


class TestLowerBoundDistance:
    @pytest.mark.parametrize("seed", range(6))
    @pytest.mark.parametrize("xi", [1, 3])
    def test_lbd_never_exceeds_subgraph_shortest(self, seed, xi):
        g = random_connected_graph(30, seed=seed, extra_edge_frac=1.0)
        apply_deltas(g, snapshot_deltas(g, alpha=0.8, tau=0.6, seed=seed + 100))
        sg = _whole_graph_sg(g)
        uw = UnitWeightIndex(sg)
        for t in (10, 20, 29):
            bset = bounding_paths(sg, 0, t, xi)
            lbd = lower_bound_distance(bset, uw)
            true = shortest_path(sg.neighbors, 0, t)[1]
            assert lbd <= true + 1e-9

    def test_initial_graph_lbd_equals_shortest(self):
        """Section 5.5: with unchanged weights every LBD is the exact
        shortest distance (unit weights all 1, BD(P) = phi(P) = D(P))."""
        g = random_connected_graph(30, seed=11, extra_edge_frac=1.0)
        sg = _whole_graph_sg(g)
        uw = UnitWeightIndex(sg)
        for t in (5, 15, 25):
            lbd = lower_bound_distance(bounding_paths(sg, 0, t, xi=3), uw)
            assert lbd == pytest.approx(shortest_path(sg.neighbors, 0, t)[1])

    def test_empty_set_returns_none(self):
        g = Graph()
        g.add_edge(0, 1, 1)
        from repro.core.bounding import BoundingSet

        assert (
            lower_bound_distance(BoundingSet([]), UnitWeightIndex(_whole_graph_sg(g)))
            is None
        )

    @settings(max_examples=30, deadline=None)
    @given(
        seed=st.integers(0, 10_000),
        tau=st.floats(0.0, 0.95),
    )
    def test_lbd_lower_bound_property(self, seed, tau):
        """Property: LBD <= true shortest for arbitrary perturbations."""
        g = random_connected_graph(18, seed=seed % 7, extra_edge_frac=0.8)
        apply_deltas(g, snapshot_deltas(g, alpha=1.0, tau=tau, seed=seed))
        sg = _whole_graph_sg(g)
        uw = UnitWeightIndex(sg)
        bset = bounding_paths(sg, 0, 15, xi=2)
        if bset.paths:
            assert lower_bound_distance(bset, uw) <= (
                shortest_path(sg.neighbors, 0, 15)[1] + 1e-9
            )


class TestSubgraphIndex:
    def test_build_covers_connected_boundary_pairs(self):
        g = random_connected_graph(60, seed=12)
        part = bfs_partition(g, z=15)
        sg = part.subgraphs[0]
        idx = build_subgraph_index(sg, part.boundary_of(0), xi=2)
        for (a, b), bset in idx.bounding.items():
            assert a < b
            assert {a, b} <= sg.vertex_set
            assert all(bp.path[0] == a and bp.path[-1] == b for bp in bset.paths)

    def test_lbd_items_match_lbd(self):
        g = random_connected_graph(60, seed=13)
        part = bfs_partition(g, z=15)
        idx = build_subgraph_index(part.subgraphs[0], part.boundary_of(0), xi=2)
        items = idx.lbd_items()
        for (a, b), val in items.items():
            assert idx.lbd(a, b) == pytest.approx(val)

    def test_directed_keeps_both_directions(self):
        g = random_connected_graph(40, seed=14, directed=True)
        part = bfs_partition(g, z=12)
        for sg in part.subgraphs:
            idx = build_subgraph_index(sg, part.boundary_of(sg.sg_id), xi=2)
            for a, b in idx.bounding:
                # paths for (a,b) run a->b even when (b,a) also indexed
                assert all(
                    bp.path[0] == a and bp.path[-1] == b
                    for bp in idx.bounding[(a, b)].paths
                )
            if idx.bounding:
                break
