"""Algorithm 2 distributed vs local: both engines must extract the same
candidate G0."""
import pytest

from repro.core.g0 import find_g0_local, find_g0_spark
from repro.graphlib.labeled import SparkLabeledGraph
from repro.synth_graphs import FIG3_IDS, figure2_graph

I = FIG3_IDS


@pytest.fixture(scope="module")
def fig2_spark(spark):
    return SparkLabeledGraph.from_local(spark, figure2_graph()).cache()


def test_fig2_g0_spark_equals_local(fig2_spark):
    g = figure2_graph()
    loc = find_g0_local(g, [0, 10], [4, 3], 1)
    dist = find_g0_spark(fig2_spark, [0, 10], [4, 3], 1)
    assert dist is not None
    assert dist.vertices == loc.vertices
    assert sorted(dist.edges()) == sorted(loc.edges())


def test_fig2_g0_spark_none_cases(fig2_spark):
    assert find_g0_spark(fig2_spark, [0, 10], [5, 3], 1) is None
    assert find_g0_spark(fig2_spark, [0, 10], [4, 3], 2) is None
    assert find_g0_spark(fig2_spark, [0, 5], [4, 4], 1) is None
    assert find_g0_spark(fig2_spark, [0, 999], [4, 3], 1) is None


def test_fig3_g0_spark_equals_local(fig3_spark, fig3_local):
    Q = [I["q_l"], I["q_r"]]
    loc = find_g0_local(fig3_local, Q, [2, 2], 1)
    dist = find_g0_spark(fig3_spark, Q, [2, 2], 1)
    assert dist is not None and loc is not None
    assert dist.vertices == loc.vertices


def test_planted_g0_spark_equals_local(planted_small_spark, planted_small, planted_small_local):
    ql = planted_small.leaders[0][0][0]
    qr = planted_small.leaders[0][1][0]
    loc = find_g0_local(planted_small_local, [ql, qr], [2, 2], 1)
    dist = find_g0_spark(planted_small_spark, [ql, qr], [2, 2], 1)
    assert (loc is None) == (dist is None)
    if loc is not None:
        assert dist.vertices == loc.vertices
        assert sorted(dist.edges()) == sorted(loc.edges())


def test_spark_g0_feeds_search(fig2_spark):
    """End-to-end: online/lp search accepts a Spark graph for phase 1."""
    from repro.core import lp_bcc, online_bcc

    a = online_bcc(fig2_spark, [0, 10], [4, 3], 1)
    b = lp_bcc(fig2_spark, [0, 10], [4, 3], 1)
    assert a is not None and b is not None
    assert a.vertices == b.vertices == {0, 1, 2, 3, 4, 5, 10, 11, 12, 13}
