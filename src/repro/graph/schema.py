"""Edge schema and builders for temporal bipartite graphs.

A temporal bipartite graph ``G = (U, V, E)`` is represented in Spark as a
DataFrame of distinct temporal edges with columns

- ``u``  (long)  — vertex id on the U side,
- ``v``  (long)  — vertex id on the V side,
- ``t``  (long)  — integer interaction timestamp (paper §2.1, footnote 1).

U-ids and V-ids live in separate namespaces (``u = 3`` and ``v = 3`` are
different vertices), matching the paper's disjoint vertex sets.
"""
from __future__ import annotations

from typing import Iterable, Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import LongType, StructField, StructType

#: Canonical Spark schema for temporal edge DataFrames.
EDGE_SCHEMA = StructType(
    [
        StructField("u", LongType(), False),
        StructField("v", LongType(), False),
        StructField("t", LongType(), False),
    ]
)

#: Column order used everywhere for edge frames.
EDGE_COLUMNS = ("u", "v", "t")


def temporal_edges(
    spark: SparkSession, triples: Iterable[Tuple[int, int, int]]
) -> DataFrame:
    """Build a distinct temporal-edge DataFrame from ``(u, v, t)`` triples."""
    pdf = pd.DataFrame(list(triples), columns=list(EDGE_COLUMNS), dtype="int64")
    return spark.createDataFrame(pdf, schema=EDGE_SCHEMA).distinct()


def edges_from_pandas(spark: SparkSession, pdf: pd.DataFrame) -> DataFrame:
    """Build a distinct temporal-edge DataFrame from a pandas frame."""
    pdf = pdf[list(EDGE_COLUMNS)].astype("int64")
    return spark.createDataFrame(pdf, schema=EDGE_SCHEMA).distinct()


def validate_edges(edges: DataFrame) -> DataFrame:
    """Validate an edge DataFrame's shape; returns the projected frame.

    Raises ``ValueError`` when a required column is missing. Casting to the
    canonical long types is applied so downstream joins never mix int32/int64.
    """
    missing = [c for c in EDGE_COLUMNS if c not in edges.columns]
    if missing:
        raise ValueError(f"edge DataFrame missing columns {missing}")
    return edges.select(*(F.col(c).cast(LongType()).alias(c) for c in EDGE_COLUMNS))


def static_edges(edges: DataFrame) -> DataFrame:
    """Project the static bipartite graph ``G`` (drop timestamps, dedupe)."""
    return edges.select("u", "v").distinct()


def snapshot(edges: DataFrame, t: int) -> DataFrame:
    """Edges of snapshot ``G_t``."""
    return edges.filter(F.col("t") == int(t)).select("u", "v").distinct()
