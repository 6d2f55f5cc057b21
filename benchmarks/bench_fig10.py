"""Benchmark + reproduction of Fig 10 (parameter-tuning sweeps)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from bench_common import once, show


def test_fig10_param_tuning(spark, benchmark):
    from repro.experiments.fig10_param_tuning import run

    out = once(
        benchmark,
        lambda: run(
            spark, n_rows={"FL": 8_000, "SP": 8_000}, ran_budget=2.0
        ),
    )
    show("Fig 10 — cell coverage vs mining parameters (FL+SP avg)", out)
    # Paper shape: SubTab above NC in every sweep setting.
    piv = out.pivot_table(
        index=["param", "value"], columns="algorithm", values="cell_coverage"
    )
    assert (piv["SubTab"] >= piv["NC"] - 0.05).all()
