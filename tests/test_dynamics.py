"""Tests for the traffic model (alpha / tau weight evolution)."""
import pytest

from repro.roadnet import (
    apply_deltas,
    evolve,
    grid_road_network,
    random_connected_graph,
    snapshot_deltas,
)


@pytest.fixture
def g():
    return random_connected_graph(60, seed=0)


class TestSnapshotDeltas:
    @pytest.mark.parametrize("alpha", [0.0, 0.1, 0.35, 0.5, 1.0])
    def test_alpha_fraction_of_edges(self, g, alpha):
        deltas = snapshot_deltas(g, alpha=alpha, tau=0.3, seed=1)
        assert len(deltas) == int(round(alpha * g.n_edges))

    def test_deterministic(self, g):
        a = snapshot_deltas(g, alpha=0.4, tau=0.3, seed=5)
        b = snapshot_deltas(g, alpha=0.4, tau=0.3, seed=5)
        assert a == b

    def test_tau_bounds_relative_to_initial(self, g):
        tau = 0.25
        deltas = snapshot_deltas(g, alpha=1.0, tau=tau, seed=2)
        for (u, v), dw in deltas:
            new_w = g.weight(u, v) + dw
            w0 = g.init_weight(u, v)
            assert (1 - tau) * w0 - 1e-9 <= new_w <= (1 + tau) * w0 + 1e-9

    def test_weights_stay_positive_even_with_huge_tau(self, g):
        deltas = snapshot_deltas(g, alpha=1.0, tau=2.0, seed=3)
        apply_deltas(g, deltas)
        for e in g.edges():
            assert g.weight(*e) > 0

    def test_trend_shifts_all_deltas_up(self, g):
        up = snapshot_deltas(g, alpha=1.0, tau=0.0, trend=0.5, seed=4)
        assert all(dw > 0 for _, dw in up)

    def test_invalid_alpha(self, g):
        with pytest.raises(ValueError):
            snapshot_deltas(g, alpha=1.5)

    def test_invalid_tau(self, g):
        with pytest.raises(ValueError):
            snapshot_deltas(g, tau=-0.1)

    def test_graph_not_modified(self, g):
        before = {e: g.weight(*e) for e in g.edges()}
        snapshot_deltas(g, alpha=0.5, tau=0.5, seed=6)
        assert before == {e: g.weight(*e) for e in g.edges()}


class TestDirectedMirroring:
    def test_mirrored_changes_identical_both_directions(self):
        g = grid_road_network(6, 6, seed=1, directed=True)
        deltas = snapshot_deltas(g, alpha=0.5, tau=0.3, seed=7, mirror_directed=True)
        apply_deltas(g, deltas)
        for u, v in g.edges():
            assert g.weight(u, v) == pytest.approx(g.weight(v, u))

    def test_independent_changes_can_diverge(self):
        g = grid_road_network(6, 6, seed=1, directed=True)
        deltas = snapshot_deltas(g, alpha=1.0, tau=0.3, seed=8, mirror_directed=False)
        apply_deltas(g, deltas)
        assert any(
            g.weight(u, v) != pytest.approx(g.weight(v, u)) for u, v in g.edges()
        )


class TestEvolve:
    def test_history_length_and_application(self, g):
        w_before = {e: g.weight(*e) for e in g.edges()}
        hist = evolve(g, n_snapshots=3, alpha=0.5, tau=0.3, seed=0)
        assert len(hist) == 3
        assert any(w_before[e] != g.weight(*e) for e in g.edges())

    def test_replaying_history_reproduces_weights(self, g):
        g2 = g.copy()
        hist = evolve(g, n_snapshots=2, alpha=0.4, tau=0.2, seed=9)
        for i in range(2):
            apply_deltas(g2, hist[i])
        assert all(
            g.weight(*e) == pytest.approx(g2.weight(*e)) for e in g.edges()
        )
