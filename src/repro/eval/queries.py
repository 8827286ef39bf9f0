"""Query-pair generation (Section 8 "Queries and parameters").

The paper draws query vertices by two knobs:

* **degree rank** ``Q_d`` — a query vertex must have degree above the
  ``Q_d`` quantile of the network (default 80%);
* **inter-distance** ``l`` — the shortest-path distance between the two
  query vertices (default 1: directly connected).

For quality evaluation the queries additionally come from the same
ground-truth community with different labels (the paper picks "any two
vertices with different labels" inside communities). When a community
has no pair meeting the degree/distance constraints we relax toward the
community's highest-degree cross-label pair, so every community stays
queryable — small stand-in graphs would otherwise starve strict
constraints.
"""
from __future__ import annotations

from typing import List, Optional, Sequence, Tuple

import numpy as np

from ..local.bfs import bfs_distances
from ..local.graph import LocalGraph
from ..synth_graphs import PlantedGraph


def degree_threshold(g: LocalGraph, qd_rank: float) -> int:
    """Smallest degree that places a vertex in the top (1-qd_rank) share."""
    degs = sorted(len(ns) for ns in g.adj.values())
    if not degs:
        return 0
    i = min(len(degs) - 1, int(qd_rank * len(degs)))
    return degs[i]


def community_query_pairs(
    pg: PlantedGraph,
    g: LocalGraph,
    *,
    n: int = 16,
    qd_rank: float = 0.8,
    inter_dist: int = 1,
    m: int = 2,
    seed: int = 0,
) -> List[Tuple[int, Tuple[int, ...]]]:
    """Sample ``n`` queries of ``m`` distinct-label vertices.

    Returns ``(community_id, (q1, ..., qm))`` tuples. For ``m == 2`` the
    pair respects degree rank and inter-distance where possible; for
    ``m > 2`` one vertex per label group is drawn (highest degree first),
    matching the paper's multi-labeled query generation.
    """
    rng = np.random.default_rng(seed)
    thr = degree_threshold(g, qd_rank)
    out: List[Tuple[int, Tuple[int, ...]]] = []
    cids = list(pg.communities)
    rng.shuffle(cids)
    for cid in cids * ((n // max(1, len(cids))) + 1):
        if len(out) >= n:
            break
        q = _one_query(pg, g, cid, thr, inter_dist, m, rng)
        if q is not None:
            out.append((cid, q))
    return out[:n]


def _one_query(
    pg: PlantedGraph,
    g: LocalGraph,
    cid: int,
    thr: int,
    inter_dist: int,
    m: int,
    rng: np.random.Generator,
) -> Optional[Tuple[int, ...]]:
    groups = [sorted(grp) for grp in _label_groups(pg, g, cid)]
    groups = [grp for grp in groups if grp]
    if len(groups) < m:
        return None
    if m == 2:
        a, b = groups[0], groups[1]
        pairs = [(u, v) for u in a for v in b]
        rng.shuffle(pairs)
        strict = [
            (u, v)
            for u, v in pairs
            if g.degree(u) >= thr and g.degree(v) >= thr
        ]
        pool = strict or pairs
        # prefer exact inter-distance, then closest
        best = None
        best_gap = None
        for u, v in pool:
            d = bfs_distances(g, u).get(v, float("inf"))
            if d == float("inf"):
                continue
            gap = abs(d - inter_dist)
            if gap == 0:
                return (u, v)
            if best_gap is None or gap < best_gap:
                best, best_gap = (u, v), gap
        return best
    # m > 2: highest-degree vertex of each of the first m groups
    picks = tuple(max(grp, key=lambda v: g.degree(v)) for grp in groups[:m])
    labs = {g.label(v) for v in picks}
    return picks if len(labs) == m else None


def _label_groups(pg: PlantedGraph, g: LocalGraph, cid: int) -> Sequence[List[int]]:
    """Community vertices grouped by label, in leader-list (label) order."""
    by_lab: dict = {}
    for v in sorted(pg.communities[cid]):
        if v in g:
            by_lab.setdefault(g.label(v), []).append(v)
    # keep the generator's label order via the leader lists
    ordered = []
    seen = set()
    for leaders in pg.leaders.get(cid, []):
        if leaders:
            lab = g.label(leaders[0]) if leaders[0] in g else None
            if lab is not None and lab not in seen:
                ordered.append(by_lab.get(lab, []))
                seen.add(lab)
    for lab, grp in by_lab.items():
        if lab not in seen:
            ordered.append(grp)
            seen.add(lab)
    return ordered
