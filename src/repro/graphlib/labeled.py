"""Distributed labeled graph over Spark DataFrames.

``SparkLabeledGraph`` is the bulk representation used for the global
phases of BCC search: per-label k-core extraction, butterfly counting,
BCindex construction, and dataset statistics. Vertices are ``(id
BIGINT, label STRING)``; edges are canonical undirected ``(src, dst)``
with ``src < dst``, deduplicated, self-loop free.

All operations are DataFrame/Catalyst only (no RDDs): adjacency is the
symmetrized edge relation, degree is a groupBy, induced subgraphs are
semi-joins.
"""
from __future__ import annotations

from typing import Tuple

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from ..local.graph import LocalGraph


class SparkLabeledGraph:
    """A labeled undirected graph held as two Spark DataFrames."""

    def __init__(self, vertices: DataFrame, edges: DataFrame):
        """``vertices``: (id, label); ``edges``: (src, dst), any orientation.

        Edges are canonicalised (src < dst, distinct, no self-loops) and
        restricted to declared vertices.
        """
        self.vertices = vertices.select(
            F.col("id").cast("long").alias("id"), F.col("label")
        ).dropDuplicates(["id"])
        ids = self.vertices.select("id")
        canon = (
            edges.select(
                F.least("src", "dst").cast("long").alias("src"),
                F.greatest("src", "dst").cast("long").alias("dst"),
            )
            .where(F.col("src") != F.col("dst"))
            .distinct()
        )
        self.edges = (
            canon.join(ids.withColumnRenamed("id", "src"), "src", "semi")
            .join(ids.withColumnRenamed("id", "dst"), "dst", "semi")
            .select("src", "dst")
        )

    # -- constructors ---------------------------------------------------
    @classmethod
    def from_pandas(
        cls, spark: SparkSession, vdf: pd.DataFrame, edf: pd.DataFrame
    ) -> "SparkLabeledGraph":
        return cls(spark.createDataFrame(vdf), spark.createDataFrame(edf))

    @classmethod
    def from_local(cls, spark: SparkSession, g: LocalGraph) -> "SparkLabeledGraph":
        vdf, edf = g.to_pandas()
        return cls.from_pandas(spark, vdf, edf)

    # -- persistence helpers -------------------------------------------
    def cache(self) -> "SparkLabeledGraph":
        self.vertices = self.vertices.cache()
        self.edges = self.edges.cache()
        return self

    def checkpointed(self) -> "SparkLabeledGraph":
        """Materialise both frames and cut lineage (for iterative loops)."""
        g = SparkLabeledGraph.__new__(SparkLabeledGraph)
        g.vertices = self.vertices.localCheckpoint(eager=True)
        g.edges = self.edges.localCheckpoint(eager=True)
        return g

    # -- relational views ----------------------------------------------
    def symmetric_edges(self) -> DataFrame:
        """Both orientations: (id, nbr) — the adjacency relation."""
        e = self.edges
        return e.select(F.col("src").alias("id"), F.col("dst").alias("nbr")).unionAll(
            e.select(F.col("dst").alias("id"), F.col("src").alias("nbr"))
        )

    def degrees(self) -> DataFrame:
        """(id, degree) for every vertex, including isolated ones (0)."""
        d = self.symmetric_edges().groupBy("id").agg(F.count("*").alias("degree"))
        return (
            self.vertices.select("id")
            .join(d, "id", "left")
            .select("id", F.coalesce("degree", F.lit(0)).alias("degree"))
        )

    # -- derived graphs -------------------------------------------------
    def induced(self, keep_ids: DataFrame) -> "SparkLabeledGraph":
        """Induced subgraph on the ``id`` column of ``keep_ids``."""
        ids = keep_ids.select("id").distinct()
        g = SparkLabeledGraph.__new__(SparkLabeledGraph)
        g.vertices = self.vertices.join(ids, "id", "semi")
        g.edges = (
            self.edges.join(ids.withColumnRenamed("id", "src"), "src", "semi")
            .join(ids.withColumnRenamed("id", "dst"), "dst", "semi")
        )
        return g

    def label_group(self, label: str) -> "SparkLabeledGraph":
        """Homogeneous subgraph induced by one label (homogeneous edges only)."""
        return self.induced(self.vertices.where(F.col("label") == label))

    def cross_edges(self, label_a: str, label_b: str) -> DataFrame:
        """Heterogeneous edges between two label groups as (left, right).

        ``left`` always carries ``label_a`` and ``right`` ``label_b``.
        """
        v = self.vertices
        a = v.where(F.col("label") == label_a).select(F.col("id").alias("a_id"))
        b = v.where(F.col("label") == label_b).select(F.col("id").alias("b_id"))
        e = self.symmetric_edges()
        return (
            e.join(a, e.id == a.a_id, "inner")
            .join(b, e.nbr == b.b_id, "inner")
            .select(F.col("id").alias("left"), F.col("nbr").alias("right"))
            .distinct()
        )

    # -- materialisation ------------------------------------------------
    def num_vertices(self) -> int:
        return self.vertices.count()

    def num_edges(self) -> int:
        return self.edges.count()

    def to_local(self) -> LocalGraph:
        """Collect to the driver-local representation (candidate graphs only)."""
        vdf = self.vertices.toPandas()
        edf = self.edges.toPandas()
        return LocalGraph.from_pandas(vdf, edf)

    def to_pandas(self) -> Tuple[pd.DataFrame, pd.DataFrame]:
        return (
            self.vertices.toPandas().sort_values("id").reset_index(drop=True),
            self.edges.toPandas().sort_values(["src", "dst"]).reset_index(drop=True),
        )
