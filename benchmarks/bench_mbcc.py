"""Exp-9/10 benchmark (Figures 14/10) — multi-labeled BCC search vs m.

Benchmarks the full mBCC quality/efficiency sweep per label count m on
the Baidu-like multi-label stand-ins.
"""
import pytest

from repro.eval.experiments import run_mbcc


@pytest.mark.parametrize("m", [2, 3, 4])
def test_mbcc_sweep(benchmark, capsys, m):
    rows = benchmark.pedantic(
        run_mbcc,
        args=("baidu1_m{m}_lite",),
        kwargs=dict(ms=(m,), methods=("L2P-BCC", "CTC", "PSA"), n_queries=6),
        rounds=1,
        iterations=1,
    )
    with capsys.disabled():
        for r in rows:
            print(
                f"\n[mbcc] m={m} {r['method']}: F1={r['f1']:.3f} "
                f"t={r['time_s']*1000:.1f}ms empty={r['empty']}"
            )
    f1 = {r["method"]: r["f1"] for r in rows}
    assert f1["L2P-BCC"] > 0.0
