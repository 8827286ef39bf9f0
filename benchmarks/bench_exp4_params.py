"""Exp-4 benchmark (Figures 8-9) — parameter sensitivity sweep (k, b)."""
import pytest

from repro.eval.experiments import run_param_sweep


def test_exp4_sweep(benchmark, capsys):
    rows = benchmark.pedantic(
        run_param_sweep,
        args=("dblp_lite",),
        kwargs=dict(n_queries=6, seed=0),
        rounds=1,
        iterations=1,
    )
    with capsys.disabled():
        print()
        for r in rows:
            print(
                f"[exp4] {r['param']}={r['value']} {r['method']}: "
                f"{r['time_s']*1000:.1f}ms"
            )
    # paper shape: larger k -> smaller G0 -> faster queries
    by = {(r["param"], r["value"], r["method"]): r["time_s"] for r in rows}
    kvals = sorted({v for p, v, m in by if p == "k"})
    assert by[("k", kvals[0], "Online-BCC")] >= by[("k", kvals[-1], "Online-BCC")] * 0.5
