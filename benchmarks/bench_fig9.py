"""Benchmark + reproduction of Fig 9 (phase runtimes, six datasets)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from bench_common import once, show

SIZES = {"FL": 20_000, "CY": 10_000, "SP": 14_000, "CC": 16_000,
         "USF": 2_000, "BL": 10_000}


def test_fig9_runtime(spark, benchmark):
    from repro.experiments.fig9_runtime import run

    out = once(benchmark, lambda: run(spark, sizes=SIZES))
    show("Fig 9 — SubTab phase running times", out)
    # Paper shape: selection is much cheaper than pre-processing.
    assert (out.select_seconds < out.preprocess_seconds).all()
