"""Distributed DTLP maintenance (Algorithm 2 on Spark) vs the driver
reference, with DuckDB oracle checks on the relational steps."""
import pytest

from repro.core import DTLP
from repro.distrib import (
    build_dtlp_spark,
    deltas_df,
    deltas_pdf,
    edges_df,
    edges_pdf,
    explode_path_edges,
    shifted_bounding_df,
    update_dtlp_spark,
    updated_edges_df,
)
from repro.oracle import assert_equivalent
from repro.roadnet import random_connected_graph, snapshot_deltas


@pytest.fixture(scope="module")
def state(spark):
    g = random_connected_graph(60, seed=31, extra_edge_frac=0.8)
    dtlp, bounding = build_dtlp_spark(spark, g, z=15, xi=4)
    deltas = snapshot_deltas(g, alpha=0.5, tau=0.4, seed=32)
    edf = edges_df(spark, g, dtlp.partition)
    ddf = deltas_df(spark, deltas)
    return g, dtlp, bounding, deltas, edf, ddf


def _skeleton_edges(dtlp):
    return {
        (min(a, b), max(a, b)): round(w, 9)
        for a in dtlp.skeleton.vertices
        for b, w in dtlp.skeleton.neighbors(a)
    }


class TestDistributedUpdate:
    def test_skeleton_matches_driver_update(self, state, spark):
        g, dtlp, bounding, deltas, edf, ddf = state
        _, _, skeleton_new = update_dtlp_spark(edf, bounding, ddf)
        spark_edges = {
            (min(r["u"], r["v"]), max(r["u"], r["v"])): round(r["mbd"], 9)
            for r in skeleton_new.collect()
        }
        ref = DTLP.build(g.copy(), z=15, xi=4)
        ref.update(deltas)
        assert spark_edges == _skeleton_edges(ref)

    def test_updated_edges_oracle(self, state, spark):
        g, dtlp, bounding, deltas, edf, ddf = state
        got = updated_edges_df(edf, ddf)
        assert_equivalent(
            got,
            """
            SELECT e.sg_id, e.u, e.v, e.w + COALESCE(d.dw, 0.0) AS w, e.w0
            FROM edges e LEFT JOIN deltas d
              ON least(e.u, e.v) = least(d.u, d.v)
             AND greatest(e.u, e.v) = greatest(d.u, d.v)
            """,
            edges=edges_pdf(g, dtlp.partition),
            deltas=deltas_pdf(deltas),
        )

    def test_shifted_dists_oracle(self, state, spark):
        g, dtlp, bounding, deltas, edf, ddf = state
        shifted = shifted_bounding_df(bounding, ddf).select(
            "sg_id", "u", "v", "path", "dist"
        )
        assert_equivalent(
            shifted,
            """
            SELECT b.sg_id, b.u, b.v, b.path, b.dist + COALESCE(s.ddist, 0.0) AS dist
            FROM bounding b LEFT JOIN (
                SELECT ep.sg_id, ep.u, ep.v, ep.path, sum(d.dw) AS ddist
                FROM ep JOIN deltas d
                  ON least(ep.eu, ep.ev) = least(d.u, d.v)
                 AND greatest(ep.eu, ep.ev) = greatest(d.u, d.v)
                GROUP BY ep.sg_id, ep.u, ep.v, ep.path
            ) s ON b.sg_id = s.sg_id AND b.u = s.u AND b.v = s.v AND b.path = s.path
            """,
            bounding=bounding.toPandas(),
            ep=explode_path_edges(bounding).toPandas(),
            deltas=deltas_pdf(deltas),
        )

    def test_multi_batch_convergence(self, state, spark):
        """Two consecutive distributed updates == rebuild on final weights."""
        g, dtlp, bounding, _, edf, _ = state
        g2 = g.copy()
        e_cur, b_cur = edf, bounding
        for i in range(2):
            d = snapshot_deltas(g2, alpha=0.3, tau=0.3, seed=50 + i)
            from repro.roadnet import apply_deltas

            apply_deltas(g2, d)
            e_cur, b_cur, skeleton = update_dtlp_spark(
                e_cur, b_cur, deltas_df(spark, d)
            )
        got = {
            (min(r["u"], r["v"]), max(r["u"], r["v"])): round(r["mbd"], 9)
            for r in skeleton.collect()
        }
        rebuilt = DTLP.build(g2, z=15, xi=4)
        assert got == _skeleton_edges(rebuilt)


class TestEPExplode:
    def test_ep_rows_count(self, state, spark):
        g, dtlp, bounding, _, _, _ = state
        n = explode_path_edges(bounding).count()
        assert n == dtlp.ep.n_entries

    def test_ep_rows_are_path_edges(self, state, spark):
        _, _, bounding, _, _, _ = state
        import json

        for r in explode_path_edges(bounding).limit(200).collect():
            verts = json.loads(r["path"])
            assert (r["eu"], r["ev"]) in set(zip(verts, verts[1:]))
