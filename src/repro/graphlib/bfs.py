"""Distributed BFS over the edge relation (iterative frontier joins).

Backs query-distance computation on the full graph (Algorithm 1 phase 1)
and the d_max / diameter-style statistics. Each round expands the
frontier by one hop with a join + anti-join; rounds = eccentricity of
the source set.
"""
from __future__ import annotations

from typing import Iterable

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from .labeled import SparkLabeledGraph


def bfs_distances(
    g: SparkLabeledGraph, sources: Iterable[int], max_rounds: int = 10_000
) -> DataFrame:
    """(id, dist) hop distances from the nearest of ``sources``.

    Unreachable vertices are absent from the result (join with the
    vertex frame and coalesce if you need explicit infinities).
    """
    spark = SparkSession.getActiveSession()
    src_list = [(int(s),) for s in sources]
    if not src_list:
        raise ValueError("bfs_distances needs at least one source")
    adj = g.symmetric_edges().localCheckpoint(eager=True)
    frontier = (
        spark.createDataFrame(src_list, "id long")
        .join(g.vertices.select("id"), "id", "semi")
        .distinct()
        .localCheckpoint(eager=True)
    )
    dist = frontier.select("id", F.lit(0).alias("dist")).localCheckpoint(eager=True)
    d = 0
    while not frontier.isEmpty():
        d += 1
        if d > max_rounds:
            raise RuntimeError("bfs did not terminate")
        frontier = (
            adj.join(frontier, "id", "semi")
            .select(F.col("nbr").alias("id"))
            .distinct()
            .join(dist, "id", "anti")
            .localCheckpoint(eager=True)
        )
        dist = dist.unionAll(
            frontier.select("id", F.lit(d).alias("dist"))
        ).localCheckpoint(eager=True)
    return dist


def query_distances(g: SparkLabeledGraph, queries: Iterable[int]) -> DataFrame:
    """Def. 5 as dataflow: (id, qdist) with qdist = max over queries.

    Vertices unreachable from some query get ``qdist = NULL`` (the
    dataflow analogue of infinity).
    """
    queries = list(queries)
    out = g.vertices.select("id")
    for i, q in enumerate(queries):
        d = bfs_distances(g, [q]).withColumnRenamed("dist", f"d{i}")
        out = out.join(d, "id", "left")
    cols = [F.col(f"d{i}") for i in range(len(queries))]
    # greatest() of any NULL must stay NULL (unreachable), so guard first
    any_null = None
    for c in cols:
        isn = c.isNull()
        any_null = isn if any_null is None else (any_null | isn)
    return out.select(
        "id",
        F.when(any_null, F.lit(None)).otherwise(F.greatest(*cols) if len(cols) > 1 else cols[0]).alias("qdist"),
    )
