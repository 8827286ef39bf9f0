"""Theorem 3 — the greedy search is a 2-approximation on the diameter.

On tiny graphs we brute-force the optimal-diameter BCC by subset
enumeration and assert diam(returned) <= 2 * diam(optimal).
"""
import math

import pytest

from repro.core import lp_bcc, online_bcc
from repro.local.bfs import diameter
from repro.local.graph import LocalGraph

from tests.helpers import brute_best_bcc_diameter, random_labeled_graph


def tiny_two_group(seed: int) -> LocalGraph:
    """Random small labeled graph with a guaranteed butterfly seed."""
    g = random_labeled_graph(10, 0.5, labels=("A", "B"), seed=seed)
    # plant a butterfly between 0,2 (A) and 1,3 (B)
    for u, v in [(0, 1), (0, 3), (2, 1), (2, 3)]:
        g.add_edge(u, v)
    return g


@pytest.mark.parametrize("seed", range(8))
def test_two_approximation_random(seed):
    g = tiny_two_group(seed)
    queries, ks, b = [0, 1], [1, 1], 1
    opt = brute_best_bcc_diameter(g, queries, ks, b)
    res = online_bcc(g, queries, ks, b)
    if math.isinf(opt):
        assert res is None
        return
    assert res is not None, "greedy must find a BCC when one exists"
    assert diameter(res.graph) <= 2 * max(opt, 1)


@pytest.mark.parametrize("seed", range(8))
@pytest.mark.parametrize("k", [1, 2])
def test_two_approximation_lp(seed, k):
    g = tiny_two_group(seed + 100)
    queries, b = [0, 1], 1
    ks = [k, k]
    opt = brute_best_bcc_diameter(g, queries, ks, b)
    res = lp_bcc(g, queries, ks, b)
    if math.isinf(opt):
        assert res is None
        return
    assert res is not None
    assert diameter(res.graph) <= 2 * max(opt, 1)


def test_greedy_matches_optimum_on_figure2():
    from repro.synth_graphs import figure2_graph

    g = figure2_graph()
    res = online_bcc(g, [0, 10], [4, 3], 1)
    # Figure 2's BCC has diameter 3; no smaller (4,3,1)-BCC exists since
    # L and R are the unique minimal cores
    assert diameter(res.graph) == 3
