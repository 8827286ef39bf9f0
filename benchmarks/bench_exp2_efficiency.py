"""Exp-2 benchmark (Figure 5) — per-method query efficiency.

Benchmarks each search method's full query workload on a medium
(dblp_lite) and the adversarial (orkut_lite, big G0) dataset; the
pytest-benchmark table is the Figure-5 comparison.
"""
import pytest

from repro.baselines import ctc, psa
from repro.core import build_bcindex_local, default_ks, l2p_bcc, lp_bcc, online_bcc
from repro.eval.datasets import load
from repro.eval.queries import community_query_pairs

N_QUERIES = 6


@pytest.fixture(scope="module", params=["dblp_lite", "orkut_lite"])
def workload(request):
    pg = load(request.param)
    g = pg.to_local()
    qs = community_query_pairs(pg, g, n=N_QUERIES, seed=0)
    ks = {Q: default_ks(g, Q) for _, Q in qs}
    idx = build_bcindex_local(g)
    return request.param, g, qs, ks, idx


@pytest.mark.parametrize("method", ["Online-BCC", "LP-BCC", "L2P-BCC", "CTC", "PSA"])
def test_exp2_efficiency(benchmark, workload, method):
    name, g, qs, ks, idx = workload

    def run_all():
        out = []
        for _, Q in qs:
            if method == "Online-BCC":
                out.append(online_bcc(g, Q, ks[Q], 1))
            elif method == "LP-BCC":
                out.append(lp_bcc(g, Q, ks[Q], 1))
            elif method == "L2P-BCC":
                out.append(l2p_bcc(g, Q, ks[Q], 1, index=idx))
            elif method == "CTC":
                out.append(ctc(g, Q))
            else:
                out.append(psa(g, Q))
        return out

    benchmark.pedantic(run_all, rounds=1, iterations=1)
