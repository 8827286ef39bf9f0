"""Exp-2 (Figure 5) — query-time efficiency of all methods.

    spark-submit jobs/exp2_efficiency.py [n_queries]
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
    spark = get_spark("exp2_efficiency")
    df = run(spark, n_queries=n)
    rows = [
        (r["dataset"], r["method"], round(r["time_s"] * 1000, 2))
        for r in df.collect()
    ]
    print(markdown_table(["dataset", "method", "mean query time (ms)"], rows))
    spark.stop()


if __name__ == "__main__":
    main()
