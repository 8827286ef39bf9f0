"""Table 4 benchmark — Online-BCC vs LP-BCC per-phase breakdown.

Benchmarks each method over the same query workload on the DBLP-like
breakdown instance, and prints the Table-4 comparison (query-distance
time, leader-pair update time, #butterfly-counting calls, total time).
"""
import pytest

from repro.core import default_ks, lp_bcc, online_bcc
from repro.eval.datasets import load
from repro.eval.experiments import run_breakdown
from repro.eval.queries import community_query_pairs
from repro.eval.tables import table4_markdown

DATASET = "dblp_bd_lite"
N_QUERIES = 8


@pytest.fixture(scope="module")
def workload():
    pg = load(DATASET)
    g = pg.to_local()
    qs = community_query_pairs(pg, g, n=N_QUERIES, seed=0)
    ks = {Q: default_ks(g, Q) for _, Q in qs}
    return g, qs, ks


@pytest.mark.parametrize("method", ["Online-BCC", "LP-BCC"])
def test_table4_method(benchmark, workload, method):
    g, qs, ks = workload
    fn = online_bcc if method == "Online-BCC" else lp_bcc

    def run_all():
        return [fn(g, Q, ks[Q], 1) for _, Q in qs]

    results = benchmark.pedantic(run_all, rounds=2, iterations=1)
    assert all(r is not None for r in results)


def test_table4_report(benchmark, capsys):
    """Print the full paper-style Table 4 with speedups."""
    bd = benchmark.pedantic(
        run_breakdown, args=(DATASET,), kwargs=dict(n_queries=N_QUERIES),
        rounds=1, iterations=1,
    )
    with capsys.disabled():
        print("\n[table4] Online-BCC vs LP-BCC on", DATASET)
        print(table4_markdown(bd))
    assert bd["speedup"]["butterfly_counting"] > 1.0
