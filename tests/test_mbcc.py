"""Multi-labeled BCC search (Section 7, Algorithm 9)."""
import pytest

from repro.core import default_ks, is_bcc, l2p_bcc, lp_bcc, online_bcc
from repro.local.graph import LocalGraph
from repro.synth_graphs import planted_bcc_graph


def chain_of_three_groups() -> LocalGraph:
    """Three K4 groups A-B-C with butterflies A<->B and B<->C only."""
    edges = []
    labels = {}
    for base, lab in [(0, "A"), (10, "B"), (20, "C")]:
        ids = [base + i for i in range(4)]
        for v in ids:
            labels[v] = lab
        edges += [(u, v) for u in ids for v in ids if u < v]
    edges += [(0, 10), (0, 11), (1, 10), (1, 11)]      # butterfly A-B
    edges += [(12, 20), (12, 21), (13, 20), (13, 21)]  # butterfly B-C
    return LocalGraph.from_edges(edges, labels)


def test_mbcc_chain_found_by_all_methods():
    g = chain_of_three_groups()
    Q = [0, 10, 20]
    ks = [3, 3, 3]
    for fn in (online_bcc, lp_bcc):
        res = fn(g, Q, ks, 1)
        assert res is not None, fn.__name__
        assert is_bcc(res.graph, Q, ks, 1)
        assert set(Q) <= res.vertices
    res = l2p_bcc(g, Q, ks, 1)
    assert res is not None
    assert is_bcc(res.graph, Q, ks, 1)


def test_mbcc_infeasible_when_chain_broken():
    g = chain_of_three_groups()
    # remove the B-C butterfly wing: no cross-group connectivity to C
    g.remove_vertex(12)
    g.remove_vertex(13)
    assert online_bcc(g, [0, 10, 20], [2, 2, 2], 1) is None


def test_mbcc_b2_infeasible():
    g = chain_of_three_groups()
    assert online_bcc(g, [0, 10, 20], [3, 3, 3], 2) is None


def test_mbcc_m2_reduces_to_bcc():
    g = chain_of_three_groups()
    res = online_bcc(g, [0, 10], [3, 3], 1)
    assert res is not None
    assert is_bcc(res.graph, [0, 10], [3, 3], 1)
    # no C vertices in a 2-labeled community
    assert all(g.label(v) != "C" for v in res.vertices)


@pytest.mark.parametrize("m", [2, 3, 4])
def test_mbcc_on_planted(m):
    pg = planted_bcc_graph(n_communities=4, n_labels=m, n_background=20, seed=m)
    g = pg.to_local()
    Q = [grp[0] for grp in pg.leaders[1]]
    ks = default_ks(g, Q)
    res = lp_bcc(g, Q, ks, 1)
    assert res is not None
    assert is_bcc(res.graph, Q, ks, 1)
    gt = pg.communities[1]
    assert len(res.vertices & gt) / len(gt) >= 0.5


def test_mbcc_online_lp_equivalent():
    pg = planted_bcc_graph(n_communities=4, n_labels=3, n_background=20, seed=9)
    g = pg.to_local()
    Q = [grp[0] for grp in pg.leaders[0]]
    ks = default_ks(g, Q)
    a = online_bcc(g, Q, ks, 1)
    b = lp_bcc(g, Q, ks, 1)
    assert (a is None) == (b is None)
    if a is not None:
        assert a.vertices == b.vertices
