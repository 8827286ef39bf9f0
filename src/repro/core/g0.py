"""Algorithm 2 — finding the maximal candidate BCC ``G0``.

Two interchangeable engines with identical semantics (cross-checked in
tests):

* :func:`find_g0_spark` — the distributed implementation: per-label
  k-core peeling, connected components, and butterfly counting all run
  as DataFrame dataflow over the full graph; only the resulting
  candidate (community sized) is collected to the driver.
* :func:`find_g0_local` — driver-local variant used by the per-query
  experiment loops, where thousands of G0 extractions would otherwise
  each pay Spark job-scheduling latency (see DESIGN.md section 2).

Both generalize Algorithm 2 from 2 to m query labels: for m > 2 the
feasibility check is cross-group connectivity (Def. 7) instead of a
single leader-pair check.
"""
from __future__ import annotations

from itertools import combinations
from typing import List, Optional, Sequence

from pyspark.sql import functions as F

from ..graphlib.butterfly import butterfly_degrees as spark_butterfly_degrees
from ..graphlib.components import component_of
from ..graphlib.kcore import kcore as spark_kcore
from ..graphlib.labeled import SparkLabeledGraph
from ..local.butterfly import butterfly_degrees
from ..local.graph import LocalGraph
from ..local.kcore import kcore_vertices
from .model import cross_bipartite


def _labels_of(queries: Sequence[int], label_lookup) -> Optional[List[object]]:
    labs = [label_lookup(q) for q in queries]
    if any(l is None for l in labs) or len(set(labs)) != len(labs):
        return None
    return labs


def _connectivity_ok(g0: LocalGraph, labels: Sequence[object], b: int) -> bool:
    """Feasibility: leader-pair check (m=2) / cross-group connectivity (m>2)."""
    groups = [g0.vertices_with_label(lab) for lab in labels]
    m = len(labels)
    if m == 2:
        chi = butterfly_degrees(cross_bipartite(g0, groups[0], groups[1]))
        return (
            max((chi[v] for v in groups[0]), default=0) >= b
            and max((chi[v] for v in groups[1]), default=0) >= b
        )
    parent = list(range(m))

    def find(x: int) -> int:
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for i, j in combinations(range(m), 2):
        bp = cross_bipartite(g0, groups[i], groups[j])
        if not any(bp.adj[v] for v in bp.adj):
            continue
        chi = butterfly_degrees(bp)
        if (
            max((chi[v] for v in groups[i]), default=0) >= b
            and max((chi[v] for v in groups[j]), default=0) >= b
        ):
            parent[find(i)] = find(j)
    return len({find(i) for i in range(m)}) == 1


def find_g0_local(
    g: LocalGraph, queries: Sequence[int], ks: Sequence[int], b: int
) -> Optional[LocalGraph]:
    """Driver-local Algorithm 2 (generalized to m labels).

    Returns the candidate ``G0 = L ∪ B ∪ R`` (induced subgraph on the
    union of the per-label core components containing each query), or
    ``None`` if any core/butterfly condition already fails.
    """
    if any(q not in g for q in queries):
        return None
    labs = _labels_of(queries, lambda q: g.label(q))
    if labs is None:
        return None
    union: set = set()
    for q, lab, k in zip(queries, labs, ks):
        sub = g.homogeneous_induced(lab)
        core_vs = kcore_vertices(sub, k)
        if q not in core_vs:
            return None
        comp = sub.induced(core_vs).component_of(q)
        union |= comp
    g0 = g.induced(union)
    if not _connectivity_ok(g0, labs, b):
        return None
    return g0


def find_g0_spark(
    sg: SparkLabeledGraph, queries: Sequence[int], ks: Sequence[int], b: int
) -> Optional[LocalGraph]:
    """Distributed Algorithm 2: the heavy passes stay in Spark.

    Per query label: induce the homogeneous subgraph, peel to the
    k_i-core, keep the connected component containing the query. Then
    collect the union, count butterflies on the cross bipartite graph
    distributed, and check feasibility. The returned candidate is the
    driver-local ``G0``.
    """
    vrows = sg.vertices.where(F.col("id").isin([int(q) for q in queries])).collect()
    lab_by_id = {int(r["id"]): r["label"] for r in vrows}
    if len(lab_by_id) != len(queries):
        return None
    labs = _labels_of(queries, lambda q: lab_by_id.get(int(q)))
    if labs is None:
        return None

    keep_frames = []
    for q, lab, k in zip(queries, labs, ks):
        group = sg.label_group(lab)
        core = spark_kcore(group, k)
        if core.vertices.where(F.col("id") == int(q)).isEmpty():
            return None
        keep_frames.append(component_of(core, int(q)))
    union_ids = keep_frames[0]
    for f in keep_frames[1:]:
        union_ids = union_ids.unionAll(f)
    g0_spark = sg.induced(union_ids)

    if len(labs) == 2:
        # distributed butterfly feasibility before collecting
        ce = g0_spark.cross_edges(labs[0], labs[1])
        chi = spark_butterfly_degrees(ce)
        lefts = ce.select(F.col("left").alias("id")).distinct()
        rights = ce.select(F.col("right").alias("id")).distinct()
        ml = chi.join(lefts, "id", "semi").agg(F.max("chi")).collect()[0][0]
        mr = chi.join(rights, "id", "semi").agg(F.max("chi")).collect()[0][0]
        if (ml or 0) < b or (mr or 0) < b:
            return None
        return g0_spark.to_local()

    g0 = g0_spark.to_local()
    if not _connectivity_ok(g0, labs, b):
        return None
    return g0
