"""Exp-1 (Figure 4) — F1 quality vs ground-truth communities.

Runs all five methods over random in-community query pairs on the seven
dataset stand-ins and prints the mean F1 per (dataset, method).

    spark-submit jobs/exp1_quality.py [n_queries]
"""
from __future__ import annotations

import sys

from pyspark.sql import DataFrame, SparkSession

from repro.eval.datasets import DATASET_PARAMS
from repro.eval.experiments import run_quality_efficiency
from repro.eval.tables import markdown_table


def run(spark: SparkSession, n_queries: int = 12) -> DataFrame:
    rows = []
    for ds in DATASET_PARAMS:
        rows.extend(run_quality_efficiency(ds, n_queries=n_queries))
    return spark.createDataFrame(rows)


def main() -> None:
    sys.path.insert(0, "src")
    from _common import get_spark  # noqa: PLC0415

    n = int(sys.argv[1]) if len(sys.argv) > 1 else 12
    spark = get_spark("exp1_quality")
    df = run(spark, n_queries=n)
    rows = [
        (r["dataset"], r["method"], round(r["f1"], 3), r["empty"])
        for r in df.collect()
    ]
    print(markdown_table(["dataset", "method", "mean F1", "#empty"], rows))
    spark.stop()


if __name__ == "__main__":
    main()
