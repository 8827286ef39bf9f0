"""Dataset statistics for Table 3: |V|, |E|, #labels, k_max, d_max.

All five statistics are computed with the distributed primitives
(degrees, coreness H-index fixpoint) so Table 3 doubles as an
integration test of the distributed tier at dataset scale.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import functions as F

from .kcore import max_coreness
from .labeled import SparkLabeledGraph


@dataclass
class GraphStats:
    """One Table-3 row."""

    name: str
    n_vertices: int
    n_edges: int
    n_labels: int
    k_max: int
    d_max: int

    def row(self) -> dict:
        return {
            "Network": self.name,
            "|V|": self.n_vertices,
            "|E|": self.n_edges,
            "Labels": self.n_labels,
            "k_max": self.k_max,
            "d_max": self.d_max,
        }


def graph_stats(g: SparkLabeledGraph, name: str = "") -> GraphStats:
    """Compute the Table-3 statistics for one labeled graph."""
    n_v = g.num_vertices()
    n_e = g.num_edges()
    n_lab = g.vertices.select("label").distinct().count()
    dmax_row = g.degrees().agg(F.max("degree").alias("m")).collect()[0]
    d_max = int(dmax_row["m"]) if dmax_row["m"] is not None else 0
    k_max = max_coreness(g)
    return GraphStats(name, n_v, n_e, n_lab, k_max, d_max)
