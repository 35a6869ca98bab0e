"""Shared helpers for spark-submit entrypoints.

Jobs are thin wrappers: each builds (or reuses) a SparkSession, calls
library functions that take the session, and prints one table.  Under
pytest the same logic runs through the ``spark`` fixture; under
spark-submit this module owns session construction.
"""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def get_spark(app: str) -> SparkSession:
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.shuffle.partitions", "64")
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .config("spark.sql.autoBroadcastJoinThreshold", -1)
        .getOrCreate()
    )


def base_parser(description: str) -> argparse.ArgumentParser:
    p = argparse.ArgumentParser(description=description)
    p.add_argument("--dataset", default="NY", choices=["NY", "COL", "FLA", "CUSA"])
    p.add_argument("--z", type=int, default=None, help="subgraph size cap")
    p.add_argument("--xi", type=int, default=12, help="bounding paths per pair")
    p.add_argument("--alpha", type=float, default=0.35, help="fraction of edges changing")
    p.add_argument("--tau", type=float, default=0.30, help="weight variation range")
    p.add_argument("--seed", type=int, default=1)
    return p


def print_table(header, rows) -> None:
    widths = [
        max(len(str(h)), *(len(str(r[i])) for r in rows)) if rows else len(str(h))
        for i, h in enumerate(header)
    ]
    line = " | ".join(str(h).ljust(w) for h, w in zip(header, widths))
    print(line)
    print("-" * len(line))
    for r in rows:
        print(" | ".join(str(x).ljust(w) for x, w in zip(r, widths)))
