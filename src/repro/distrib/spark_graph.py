"""Graph <-> Spark DataFrame bridges.

The Storm deployment in Section 6.1 ships three kinds of state around
the cluster: subgraphs (adjacency lists held by SubgraphBolts), the
replicated skeleton graph, and query/update tuples.  Here:

* subgraphs are rows of an **edges DataFrame** keyed by ``sg_id`` —
  ``groupBy("sg_id").applyInPandas`` is the SubgraphBolt;
* the skeleton graph plus everything a QueryBolt needs is a Spark
  **broadcast** of the picklable DTLP object (replication, as in the
  paper);
* queries and weight deltas are plain DataFrames.

All schemas are explicit so Catalyst plans don't depend on inference.
"""
from __future__ import annotations

import json
from typing import Iterable, List, Sequence, Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

from ..core.dtlp import DTLP
from ..core.partition import Partition
from ..roadnet.graph import Edge, Graph

EDGES_SCHEMA = T.StructType(
    [
        T.StructField("sg_id", T.IntegerType(), False),
        T.StructField("u", T.IntegerType(), False),
        T.StructField("v", T.IntegerType(), False),
        T.StructField("w", T.DoubleType(), False),
        T.StructField("w0", T.IntegerType(), False),
    ]
)

DELTAS_SCHEMA = T.StructType(
    [
        T.StructField("u", T.IntegerType(), False),
        T.StructField("v", T.IntegerType(), False),
        T.StructField("dw", T.DoubleType(), False),
    ]
)

QUERIES_SCHEMA = T.StructType(
    [
        T.StructField("qid", T.IntegerType(), False),
        T.StructField("s", T.IntegerType(), False),
        T.StructField("t", T.IntegerType(), False),
        T.StructField("k", T.IntegerType(), False),
    ]
)

BOUNDING_SCHEMA = T.StructType(
    [
        T.StructField("sg_id", T.IntegerType(), False),
        T.StructField("u", T.IntegerType(), False),
        T.StructField("v", T.IntegerType(), False),
        T.StructField("path", T.StringType(), False),
        T.StructField("phi", T.IntegerType(), False),
        T.StructField("dist", T.DoubleType(), False),
        T.StructField("bd", T.DoubleType(), False),
        T.StructField("complete", T.BooleanType(), False),
    ]
)

RESULTS_SCHEMA = T.StructType(
    [
        T.StructField("qid", T.IntegerType(), False),
        T.StructField("rank", T.IntegerType(), False),
        T.StructField("path", T.StringType(), False),
        T.StructField("dist", T.DoubleType(), False),
        T.StructField("n_iterations", T.IntegerType(), False),
    ]
)


def edges_pdf(graph: Graph, partition: Partition) -> pd.DataFrame:
    """Edge rows with their owning subgraph, as pandas (for DuckDB too)."""
    rows = [
        (
            partition.subgraph_of_edge[e],
            e[0],
            e[1],
            graph.weight(*e),
            graph.init_weight(*e),
        )
        for e in graph.edges()
    ]
    return pd.DataFrame(rows, columns=["sg_id", "u", "v", "w", "w0"])


def edges_df(spark: SparkSession, graph: Graph, partition: Partition) -> DataFrame:
    return spark.createDataFrame(edges_pdf(graph, partition), schema=EDGES_SCHEMA)


def deltas_pdf(deltas: Sequence[Tuple[Edge, float]]) -> pd.DataFrame:
    return pd.DataFrame(
        [(u, v, dw) for (u, v), dw in deltas], columns=["u", "v", "dw"]
    )


def deltas_df(spark: SparkSession, deltas: Sequence[Tuple[Edge, float]]) -> DataFrame:
    return spark.createDataFrame(deltas_pdf(deltas), schema=DELTAS_SCHEMA)


def queries_df(
    spark: SparkSession, queries: Sequence[Tuple[int, int]], k: int
) -> DataFrame:
    pdf = pd.DataFrame(
        [(i, s, t, k) for i, (s, t) in enumerate(queries)],
        columns=["qid", "s", "t", "k"],
    )
    return spark.createDataFrame(pdf, schema=QUERIES_SCHEMA)


def encode_path(path: Iterable[int]) -> str:
    return json.dumps(list(path), separators=(",", ":"))


def decode_path(s: str) -> List[int]:
    return json.loads(s)


def ensure_group_parallelism(spark: SparkSession) -> None:
    """Disable AQE partition coalescing for compute-heavy group stages.

    The per-subgraph build/refine stages shuffle only a few MB, so AQE
    would coalesce them into one task and serialize the whole cluster's
    compute onto one worker; the cost here is CPU per *group*, not
    bytes.  Runtime-settable, idempotent.
    """
    spark.conf.set("spark.sql.adaptive.coalescePartitions.enabled", "false")


def broadcast_dtlp(spark: SparkSession, dtlp: DTLP):
    """Replicate the DTLP snapshot to every worker (Section 5.2: the
    skeleton graph "lends itself well to be replicated to any node")."""
    return spark.sparkContext.broadcast(dtlp)
