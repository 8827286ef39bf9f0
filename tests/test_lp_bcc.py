"""LP-BCC — the accelerated search must return the same communities as
Online-BCC (Algorithms 5-7 are exact accelerations, not heuristics)."""
import pytest

from repro.core import default_ks, is_bcc, lp_bcc, online_bcc
from repro.eval.datasets import load
from repro.eval.queries import community_query_pairs
from repro.synth_graphs import figure2_graph, figure3_graph, planted_bcc_graph, FIG3_IDS

I = FIG3_IDS


def test_figure2_same_as_online():
    g = figure2_graph()
    a = online_bcc(g, [0, 10], [4, 3], 1)
    b = lp_bcc(g, [0, 10], [4, 3], 1)
    assert a.vertices == b.vertices
    assert a.qdist == b.qdist


def test_figure3_same_as_online():
    g = figure3_graph()
    a = online_bcc(g, [I["q_l"], I["q_r"]], [2, 2], 1)
    b = lp_bcc(g, [I["q_l"], I["q_r"]], [2, 2], 1)
    assert a.vertices == b.vertices


@pytest.mark.parametrize("seed", range(6))
def test_equivalence_on_planted(seed):
    pg = planted_bcc_graph(
        n_communities=6, n_background=40, homo_noise_frac=0.04, seed=seed
    )
    g = pg.to_local()
    for cid in (0, 2):
        ql, qr = pg.leaders[cid][0][0], pg.leaders[cid][1][0]
        ks = default_ks(g, [ql, qr])
        a = online_bcc(g, [ql, qr], ks, 1)
        b = lp_bcc(g, [ql, qr], ks, 1)
        assert (a is None) == (b is None)
        if a is not None:
            assert a.vertices == b.vertices, f"cid={cid}"
            assert a.qdist == b.qdist


@pytest.mark.parametrize("dataset", ["baidu1_lite", "dblp_lite"])
def test_equivalence_on_datasets(dataset):
    pg = load(dataset)
    g = pg.to_local()
    for cid, Q in community_query_pairs(pg, g, n=4, seed=1):
        ks = default_ks(g, Q)
        a = online_bcc(g, Q, ks, 1)
        b = lp_bcc(g, Q, ks, 1)
        assert (a is None) == (b is None)
        if a is not None:
            assert a.vertices == b.vertices
            assert is_bcc(b.graph, Q, ks, 1)


def test_lp_fewer_butterfly_counts():
    """The leader-pair strategy must reduce Algorithm-3 invocations."""
    pg = load("dblp_bd_lite")
    g = pg.to_local()
    worse = 0
    for cid, Q in community_query_pairs(pg, g, n=4, seed=0):
        ks = default_ks(g, Q)
        a = online_bcc(g, Q, ks, 1)
        b = lp_bcc(g, Q, ks, 1)
        if a is None:
            continue
        if b.stats["butterfly_counting"] > a.stats["butterfly_counting"]:
            worse += 1
    assert worse == 0


def test_lp_stats_shape():
    g = figure2_graph()
    res = lp_bcc(g, [0, 10], [4, 3], 1)
    assert res.stats["butterfly_counting"] >= 1
    assert "qdist_time" in res.stats and "leader_time" in res.stats
