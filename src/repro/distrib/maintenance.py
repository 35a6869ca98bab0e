"""Distributed DTLP maintenance (Algorithm 2 as Spark dataflow).

A batch of weight deltas flows through the same three steps the driver
reference (:meth:`repro.core.dtlp.DTLP.update`) performs, but expressed
relationally so each is a Catalyst plan:

1. **EP-Index join** — bounding paths are exploded into (path, edge)
   rows; joining with the delta batch on the canonical edge key and
   re-aggregating per path shifts every covered path's distance by the
   sum of its edges' deltas (Algorithm 2, line 3);
2. **edge refresh** — the edges DataFrame gets its new weights via the
   same canonical-key join;
3. **bound-distance refresh** — a cogrouped ``applyInPandas`` over
   (edges, paths) per subgraph rebuilds the unit-weight multiset and
   recomputes every path's ``bd`` (line 4), after which the build
   module's SQL derives LBD and the new skeleton (lines 5-8).

Steps 1-2 are checked against the DuckDB oracle; the end-to-end result
is checked for equality with the driver reference update.
"""
from __future__ import annotations

from typing import Iterator, Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

from ..roadnet.graph import Graph, Subgraph
from .dtlp_build import lbd_df_from_bounding, skeleton_df_from_lbd
from .spark_graph import BOUNDING_SCHEMA, decode_path

EP_SCHEMA = T.StructType(
    [
        T.StructField("sg_id", T.IntegerType(), False),
        T.StructField("u", T.IntegerType(), False),
        T.StructField("v", T.IntegerType(), False),
        T.StructField("path", T.StringType(), False),
        T.StructField("eu", T.IntegerType(), False),
        T.StructField("ev", T.IntegerType(), False),
    ]
)


def explode_path_edges(bounding: DataFrame) -> DataFrame:
    """The EP-Index as a DataFrame: one row per (bounding path, edge)."""

    def fn(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            rows = []
            for sg_id, u, v, path in zip(
                pdf["sg_id"], pdf["u"], pdf["v"], pdf["path"]
            ):
                verts = decode_path(path)
                for a, b in zip(verts, verts[1:]):
                    rows.append((int(sg_id), int(u), int(v), path, int(a), int(b)))
            yield pd.DataFrame(
                rows, columns=["sg_id", "u", "v", "path", "eu", "ev"]
            )

    return bounding.mapInPandas(fn, schema=EP_SCHEMA)


def _with_canonical(df: DataFrame, a: str, b: str) -> DataFrame:
    """Add canonical (lo, hi) edge-key columns for undirected joins."""
    return df.withColumn("lo", F.least(F.col(a), F.col(b))).withColumn(
        "hi", F.greatest(F.col(a), F.col(b))
    )


def shifted_bounding_df(bounding: DataFrame, deltas: DataFrame) -> DataFrame:
    """Algorithm 2 line 3: dist += sum of deltas over the path's edges."""
    ep = _with_canonical(explode_path_edges(bounding), "eu", "ev")
    d = _with_canonical(deltas, "u", "v").select("lo", "hi", "dw")
    per_path = (
        ep.join(d, on=["lo", "hi"], how="inner")
        .groupBy("sg_id", "u", "v", "path")
        .agg(F.sum("dw").alias("ddist"))
    )
    return (
        bounding.join(per_path, on=["sg_id", "u", "v", "path"], how="left")
        .withColumn("dist", F.col("dist") + F.coalesce(F.col("ddist"), F.lit(0.0)))
        .drop("ddist")
    )


def updated_edges_df(edges: DataFrame, deltas: DataFrame) -> DataFrame:
    """Apply the delta batch to the edges DataFrame (canonical-key join)."""
    e = _with_canonical(edges, "u", "v")
    d = _with_canonical(deltas, "u", "v").select("lo", "hi", "dw")
    return (
        e.join(d, on=["lo", "hi"], how="left")
        .withColumn("w", F.col("w") + F.coalesce(F.col("dw"), F.lit(0.0)))
        .select("sg_id", "u", "v", "w", "w0")
    )


def refreshed_bd_df(edges_new: DataFrame, bounding_new: DataFrame) -> DataFrame:
    """Recompute every path's bound distance from its subgraph's new weights."""

    def fn(edges_pdf: pd.DataFrame, paths_pdf: pd.DataFrame) -> pd.DataFrame:
        if paths_pdf.empty:
            return paths_pdf
        from ..core.bounding import UnitWeightIndex

        g = Graph()
        for u, v, w, w0 in zip(
            edges_pdf["u"], edges_pdf["v"], edges_pdf["w"], edges_pdf["w0"]
        ):
            g.add_edge(int(u), int(v), int(w0), float(w))
        uw = UnitWeightIndex(Subgraph(g, int(edges_pdf["sg_id"].iloc[0]), list(g.edges())))
        out = paths_pdf.copy()
        out["bd"] = [uw.bd_capped(int(phi)) for phi in out["phi"]]
        return out

    return (
        edges_new.groupBy("sg_id")
        .cogroup(bounding_new.groupBy("sg_id"))
        .applyInPandas(fn, schema=BOUNDING_SCHEMA)
    )


def update_dtlp_spark(
    edges: DataFrame, bounding: DataFrame, deltas: DataFrame
) -> Tuple[DataFrame, DataFrame, DataFrame]:
    """Full distributed Algorithm 2.

    Returns ``(edges_new, bounding_new, skeleton_new)`` — the refreshed
    dataflow state; the driver swaps these in for the next snapshot.
    """
    edges_new = updated_edges_df(edges, deltas)
    shifted = shifted_bounding_df(bounding, deltas)
    bounding_new = refreshed_bd_df(edges_new, shifted)
    skeleton_new = skeleton_df_from_lbd(lbd_df_from_bounding(bounding_new))
    return edges_new, bounding_new, skeleton_new
