"""BCC model definitions and from-scratch verification.

``is_bcc`` re-checks every condition of Definition 4 (and Definition 8
for m > 2) against a candidate subgraph, independent of the search
machinery — every community returned by any of our algorithms is
re-verified with it in tests.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from itertools import combinations
from typing import Dict, List, Optional, Sequence, Set

from ..local.bfs import diameter as local_diameter
from ..local.butterfly import Bipartite, butterfly_degrees
from ..local.graph import LocalGraph


@dataclass
class BCCResult:
    """A community returned by a BCC search.

    ``graph`` is the induced subgraph; ``qdist`` its query distance
    (Def. 5) at return time; ``stats`` holds instrumentation used by
    Table 4 (timers in seconds, counters as ints).
    """

    graph: LocalGraph
    queries: List[int]
    qdist: float
    stats: Dict[str, float] = field(default_factory=dict)

    @property
    def vertices(self) -> Set[int]:
        return self.graph.vertices

    def diameter(self) -> float:
        return local_diameter(self.graph)


def group_partition(g: LocalGraph, labels: Sequence[object]) -> List[Set[int]]:
    """Vertex sets per label, in label order."""
    return [g.vertices_with_label(lab) for lab in labels]


def cross_bipartite(g: LocalGraph, va: Set[int], vb: Set[int]) -> Bipartite:
    """The bipartite cross graph between two vertex groups of ``g``."""
    edges = [(u, v) for u in va for v in g.adj[u] if v in vb]
    return Bipartite(va, vb, edges)


def pair_satisfied(g: LocalGraph, va: Set[int], vb: Set[int], b: int) -> bool:
    """Condition 4 of Def. 4 for one group pair: a leader on each side
    with butterfly degree >= b."""
    bp = cross_bipartite(g, va, vb)
    chi = butterfly_degrees(bp)
    max_a = max((chi[v] for v in va), default=0)
    max_b = max((chi[v] for v in vb), default=0)
    return max_a >= b and max_b >= b


def is_bcc(
    g: LocalGraph,
    queries: Sequence[int],
    ks: Sequence[int],
    b: int,
    labels: Optional[Sequence[object]] = None,
) -> bool:
    """Full check of Problem 1 conditions 1-2 (Def. 4 / Def. 8).

    * connected subgraph containing all queries;
    * exactly the m query labels present;
    * each label group induces a k_i-core (over homogeneous edges);
    * m = 2: leader pair with butterfly degree >= b;
      m > 2: cross-group connectivity (Def. 7) over the label graph.
    """
    if labels is None:
        if any(q not in g for q in queries):
            return False
        labels = [g.label(q) for q in queries]
    if len(set(labels)) != len(labels):
        return False
    if not g.connected(queries):
        return False
    if g.label_set() != set(labels):
        return False
    groups = group_partition(g, labels)
    for q, lab, vs in zip(queries, labels, groups):
        if q not in vs:
            return False
    for k, vs in zip(ks, groups):
        sub = g.induced(vs)
        if any(len(sub.adj[v]) < k for v in sub.adj):
            return False
    if len(labels) == 2:
        return pair_satisfied(g, groups[0], groups[1], b)
    # Def. 7/8: label graph H_m with an edge per satisfied pair must connect
    m = len(labels)
    parent = list(range(m))

    def find(x: int) -> int:
        while parent[x] != x:
            parent[x] = parent[parent[x]]
            x = parent[x]
        return x

    for i, j in combinations(range(m), 2):
        if pair_satisfied(g, groups[i], groups[j], b):
            parent[find(i)] = find(j)
    return len({find(i) for i in range(m)}) == 1
