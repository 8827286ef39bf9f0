"""RefinementEngine internals and edge cases."""
import pytest

from repro.core.engine import PairState, RefinementEngine
from repro.core.g0 import find_g0_local
from repro.local.butterfly import Bipartite, butterfly_degrees
from repro.local.graph import LocalGraph
from repro.synth_graphs import figure2_graph, planted_bcc_graph


def fig2_engine(fast=False):
    g = figure2_graph()
    g0 = find_g0_local(g, [0, 10], [4, 3], 1)
    return RefinementEngine(g0, [0, 10], [4, 3], 1, fast=fast)


def test_initial_pair_state_satisfied():
    eng = fig2_engine()
    assert len(eng.pairs) == 1
    assert eng.pairs[0].satisfied


def test_hdeg_initialised_correctly():
    eng = fig2_engine()
    for v in eng.g.adj:
        expect = sum(
            1 for u in eng.g.adj[v] if eng.g.labels[u] == eng.g.labels[v]
        )
        assert eng.hdeg[v] == expect


def test_delete_and_maintain_cascades():
    eng = fig2_engine()
    # deleting v1..v4 from the 4-core collapses the whole left side
    gone = eng._delete_and_maintain({1, 2, 3, 4})
    assert {1, 2, 3, 4} <= set(gone)
    assert 0 not in eng.g or eng.hdeg.get(0, 0) >= 0  # q_l peeled or consistent
    # hdeg stays consistent for survivors
    for v in eng.g.adj:
        expect = sum(
            1 for u in eng.g.adj[v] if eng.g.labels[u] == eng.g.labels[v]
        )
        assert eng.hdeg[v] == expect


def test_bipartite_kept_in_sync():
    eng = fig2_engine(fast=True)
    eng._delete_and_maintain({5})
    ps = eng.pairs[0]
    assert 5 not in ps.bp.adj
    # rebuilt-from-scratch chi equals engine bipartite chi
    chi = butterfly_degrees(ps.bp)
    for v, c in chi.items():
        assert v in eng.g


def test_fast_mode_leaders_assigned():
    eng = fig2_engine(fast=True)
    ps = eng.pairs[0]
    assert ps.leaders[0] is not None and ps.leaders[1] is not None
    assert ps.leader_chi[0] >= 1 and ps.leader_chi[1] >= 1


def test_online_mode_no_leaders():
    eng = fig2_engine(fast=False)
    assert eng.pairs[0].leaders == [None, None]


def test_run_twice_is_error_free_via_fresh_engines():
    a = fig2_engine().run()
    b = fig2_engine().run()
    assert a.vertices == b.vertices


def test_max_iterations_guard():
    g = figure2_graph()
    g0 = find_g0_local(g, [0, 10], [4, 3], 1)
    eng = RefinementEngine(g0, [0, 10], [4, 3], 1, max_iterations=1)
    res = eng.run()
    # one iteration still records the initial feasible snapshot
    assert res is not None
    assert eng.stats["iterations"] == 1


def test_pairstate_side_vertices():
    bp = Bipartite([1], [2], [(1, 2)])
    ps = PairState(0, 1, bp)
    assert ps.side_vertices(0) == {1}
    assert ps.side_vertices(1) == {2}


def test_m3_pairs_without_cross_edges_skipped():
    pg = planted_bcc_graph(
        n_communities=2, n_labels=3, n_background=0, noise_frac=0.0, seed=1
    )
    g = pg.to_local()
    Q = [grp[0] for grp in pg.leaders[0]]
    g0 = find_g0_local(g, Q, [2, 2, 2], 1)
    if g0 is None:
        pytest.skip("no candidate for this draw")
    eng = RefinementEngine(g0, Q, [2, 2, 2], 1)
    # pairs only exist for label pairs with cross edges (consecutive groups)
    assert 1 <= len(eng.pairs) <= 3


def test_snapshot_qdist_decreases_monotonically():
    pg = planted_bcc_graph(n_communities=5, homo_noise_frac=0.05, seed=11)
    g = pg.to_local()
    ql, qr = pg.leaders[0][0][0], pg.leaders[0][1][0]
    from repro.core import default_ks

    ks = default_ks(g, [ql, qr])
    g0 = find_g0_local(g, [ql, qr], ks, 1)
    if g0 is None:
        pytest.skip("no candidate")
    eng = RefinementEngine(g0, [ql, qr], ks, 1)
    res = eng.run()
    assert res is not None
    # the returned snapshot is at most the size of g0 and has qdist <=
    # g0's query distance
    from repro.local.bfs import query_distances

    if g0.connected([ql, qr]):
        qd0 = max(query_distances(g0, [ql, qr]).values())
        assert res.qdist <= qd0
