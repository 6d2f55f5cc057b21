"""Benchmark + reproduction of Fig 7 (slow baselines on FL)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from bench_common import once, show


def test_fig7_slow_baselines(spark, benchmark):
    from repro.experiments.fig7_slow_baselines import run

    out = once(
        benchmark,
        lambda: run(
            spark, n_rows=8_000, greedy_budget=30.0, mab_budget=15.0
        ),
    )
    show("Fig 7 — quality vs total runtime (FL)", out)
    t = out.set_index("algorithm")
    # Paper shape: EmbDI is the slow embedding; SubTab is interactive.
    assert t.loc["EmbDI", "total_seconds"] > t.loc["SubTab", "total_seconds"]
