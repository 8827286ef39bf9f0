"""Table-3 statistics computed on the distributed tier."""
from repro.graphlib.stats import graph_stats
from repro.local.kcore import coreness as local_coreness


def test_fig3_stats(fig3_spark, fig3_local):
    st = graph_stats(fig3_spark, "fig3")
    assert st.n_vertices == len(fig3_local)
    assert st.n_edges == fig3_local.num_edges()
    assert st.n_labels == 2
    assert st.d_max == max(fig3_local.degree(v) for v in fig3_local.vertices)
    assert st.k_max == max(local_coreness(fig3_local).values())


def test_planted_stats(planted_small_spark, planted_small_local):
    st = graph_stats(planted_small_spark, "planted")
    g = planted_small_local
    assert st.n_vertices == len(g)
    assert st.n_edges == g.num_edges()
    assert st.n_labels == len(g.label_set())
    assert st.d_max == max(g.degree(v) for v in g.vertices)
    assert st.k_max == max(local_coreness(g).values())


def test_stats_row_format(fig3_spark):
    st = graph_stats(fig3_spark, "x")
    row = st.row()
    assert set(row) == {"Network", "|V|", "|E|", "Labels", "k_max", "d_max"}
    assert row["Network"] == "x"
