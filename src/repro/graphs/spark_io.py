"""Spark DataFrame representation of graphs.

Canonical schemas:

* **undirected edge table** — one row per edge, ``src < dst`` (what the
  generators emit, what the DuckDB oracle sees);
* **symmetric edge table** — both directions materialised, the form every
  DataFrame graph algorithm (BFS, label propagation) joins against.

All helpers are pure DataFrame/Catalyst operations so their results can be
cross-checked with :func:`repro.oracle.assert_equivalent`.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .csr import CSRGraph


def edges_spark(spark: SparkSession, g: CSRGraph) -> DataFrame:
    """Undirected canonical edge table (``src < dst``) of ``g``."""
    pdf = g.edge_pandas()
    return spark.createDataFrame(pdf.astype({"src": "int64", "dst": "int64"}))


def symmetric_edges(edges: DataFrame) -> DataFrame:
    """Both directions of every undirected edge: columns ``src``, ``dst``."""
    return edges.select("src", "dst").unionAll(
        edges.select(F.col("dst").alias("src"), F.col("src").alias("dst"))
    )


def vertices(spark: SparkSession, g: CSRGraph) -> DataFrame:
    """Vertex table ``id: long`` for ``0..n-1``."""
    return spark.createDataFrame(pd.DataFrame({"id": range(g.n)}))


def degrees(edges: DataFrame) -> DataFrame:
    """Degree of every vertex with at least one edge: ``id``, ``degree``.

    Computed from the undirected edge table by exploding both endpoints —
    a pure relational formulation the DuckDB oracle can replicate.
    """
    return (
        symmetric_edges(edges)
        .groupBy(F.col("src").alias("id"))
        .agg(F.count("*").alias("degree"))
    )


def edge_count(edges: DataFrame) -> int:
    """Number of undirected edges."""
    return edges.count()
