"""Distributed connected components by min-id propagation.

Each round every vertex adopts the minimum component id in its closed
neighbourhood; convergence after O(diameter) rounds. Used to restrict
per-label cores to the component containing the query vertex
(Algorithm 2 lines 2-3).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from .labeled import SparkLabeledGraph


def connected_components(g: SparkLabeledGraph, max_rounds: int = 10_000) -> DataFrame:
    """(id, component) where component = min vertex id in the component."""
    adj = g.symmetric_edges().localCheckpoint(eager=True)
    comp = g.vertices.select("id", F.col("id").alias("component")).localCheckpoint(
        eager=True
    )
    for _ in range(max_rounds):
        nbr_min = (
            adj.join(
                comp.select(
                    F.col("id").alias("nbr"), F.col("component").alias("nbr_comp")
                ),
                "nbr",
            )
            .groupBy("id")
            .agg(F.min("nbr_comp").alias("nbr_comp"))
        )
        new_comp = (
            comp.join(nbr_min, "id", "left")
            .select(
                "id",
                F.least(
                    F.col("component"), F.coalesce(F.col("nbr_comp"), F.col("component"))
                ).alias("component"),
            )
            .localCheckpoint(eager=True)
        )
        changed = (
            new_comp.join(
                comp.withColumnRenamed("component", "old"), "id"
            )
            .where(F.col("component") != F.col("old"))
            .isEmpty()
        )
        comp = new_comp
        if changed:
            return comp
    raise RuntimeError("connected_components did not converge")


def component_of(g: SparkLabeledGraph, vertex: int) -> DataFrame:
    """ids of the component containing ``vertex`` (empty if absent)."""
    comp = connected_components(g)
    target = comp.where(F.col("id") == int(vertex)).select(
        F.col("component").alias("target")
    )
    return (
        comp.join(target, comp.component == target.target, "semi").select("id")
    )
