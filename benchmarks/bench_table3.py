"""Table 3 benchmark — distributed dataset statistics.

One benchmark per dataset stand-in: the full statistics pass (degrees,
label count, distributed H-index coreness for k_max) over the Spark
graph. Regenerates the Table-3 rows recorded in EXPERIMENTS.md.
"""
import pytest

from repro.eval.datasets import DATASET_PARAMS, load
from repro.graphlib import SparkLabeledGraph, graph_stats


@pytest.mark.parametrize("dataset", list(DATASET_PARAMS))
def test_table3_stats(benchmark, spark, dataset):
    pg = load(dataset)
    sg = SparkLabeledGraph(*pg.to_spark(spark)).cache()
    sg.num_edges()  # materialise before timing

    st = benchmark.pedantic(graph_stats, args=(sg, dataset), rounds=1, iterations=1)
    row = st.row()
    assert row["|V|"] > 0 and row["k_max"] > 0
    print(f"[table3] {row}")
