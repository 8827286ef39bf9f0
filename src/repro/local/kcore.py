"""Driver-local k-core extraction, maintenance, and coreness decomposition.

Used (a) inside the refinement loop (Algorithm 4 maintains the two
label-group cores after each bulk deletion) and (b) as the reference
implementation for the distributed k-core in ``repro.graphlib.kcore``.
"""
from __future__ import annotations

from collections import deque
from typing import Dict, Iterable, Set

from .graph import LocalGraph


def kcore_vertices(g: LocalGraph, k: int) -> Set[int]:
    """Vertex set of the (maximal) k-core of ``g``: peel deg < k to fixpoint."""
    deg = {v: len(ns) for v, ns in g.adj.items()}
    alive = set(g.adj)
    q = deque(v for v, d in deg.items() if d < k)
    while q:
        v = q.popleft()
        if v not in alive:
            continue
        alive.discard(v)
        for u in g.adj[v]:
            if u in alive:
                deg[u] -= 1
                if deg[u] < k:
                    q.append(u)
    return alive


def kcore(g: LocalGraph, k: int) -> LocalGraph:
    """The maximal k-core of ``g`` as an induced subgraph."""
    return g.induced(kcore_vertices(g, k))


def peel_to_kcore(g: LocalGraph, k: int, removed: Iterable[int]) -> Set[int]:
    """Core maintenance: cascade-delete after ``removed`` left ``g``.

    ``g`` is assumed to have been a k-core before ``removed`` were
    deleted (they are already gone from ``g``). Mutates ``g`` in place,
    peeling any vertex whose degree fell below ``k``, and returns the
    set of additionally deleted vertices.
    """
    q = deque(v for v in g.adj if len(g.adj[v]) < k)
    gone: Set[int] = set()
    while q:
        v = q.popleft()
        if v not in g.adj or len(g.adj[v]) >= k:
            continue
        gone.add(v)
        ns = list(g.adj[v])
        g.remove_vertex(v)
        for u in ns:
            if u in g.adj and len(g.adj[u]) < k:
                q.append(u)
    return gone


def coreness(g: LocalGraph) -> Dict[int, int]:
    """Full core decomposition by min-degree peeling (lazy heap).

    Returns ``delta[v]`` = the largest k such that v is in a k-core.
    """
    import heapq

    deg = {v: len(ns) for v, ns in g.adj.items()}
    heap = [(d, v) for v, d in deg.items()]
    heapq.heapify(heap)
    removed: Set[int] = set()
    core: Dict[int, int] = {}
    k = 0
    while heap:
        d, v = heapq.heappop(heap)
        if v in removed or d != deg[v]:
            continue  # stale entry
        k = max(k, d)
        core[v] = k
        removed.add(v)
        for u in g.adj[v]:
            if u not in removed:
                deg[u] -= 1
                heapq.heappush(heap, (deg[u], u))
    return core


def max_coreness(g: LocalGraph) -> int:
    """k_max of the graph (0 for an empty graph)."""
    c = coreness(g)
    return max(c.values(), default=0)
