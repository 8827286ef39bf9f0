"""Distributed connected components vs the local reference."""
import pandas as pd

from repro.graphlib.components import component_of, connected_components
from repro.graphlib.labeled import SparkLabeledGraph


def _component_sets(rows):
    by_comp = {}
    for r in rows:
        by_comp.setdefault(r["component"], set()).add(r["id"])
    return sorted(by_comp.values(), key=lambda s: min(s))


def _local_component_sets(g):
    seen, out = set(), []
    for v in sorted(g.vertices):
        if v not in seen:
            c = g.component_of(v)
            seen |= c
            out.append(c)
    return sorted(out, key=lambda s: min(s))


def test_fig3_single_component(fig3_spark, fig3_local):
    rows = connected_components(fig3_spark).collect()
    assert _component_sets(rows) == _local_component_sets(fig3_local)


def test_multi_component(spark):
    vdf = pd.DataFrame({"id": [1, 2, 3, 4, 5], "label": ["A"] * 5})
    edf = pd.DataFrame({"src": [1, 3], "dst": [2, 4]})
    g = SparkLabeledGraph.from_pandas(spark, vdf, edf)
    rows = connected_components(g).collect()
    assert _component_sets(rows) == [{1, 2}, {3, 4}, {5}]


def test_component_of(spark):
    vdf = pd.DataFrame({"id": [1, 2, 3, 4], "label": ["A"] * 4})
    edf = pd.DataFrame({"src": [1, 3], "dst": [2, 4]})
    g = SparkLabeledGraph.from_pandas(spark, vdf, edf)
    got = {r["id"] for r in component_of(g, 3).collect()}
    assert got == {3, 4}


def test_component_labels_are_min_ids(planted_small_spark, planted_small_local):
    rows = connected_components(planted_small_spark).collect()
    got = _component_sets(rows)
    assert got == _local_component_sets(planted_small_local)
    for r in rows:
        assert r["component"] == min(
            next(s for s in got if r["id"] in s)
        )
