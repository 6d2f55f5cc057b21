"""Benchmark + reproduction of Fig 8 (quality metrics, FL+SP+CY)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from bench_common import once, show


def test_fig8_quality(spark, benchmark):
    from repro.experiments.fig8_quality import run

    out = once(
        benchmark,
        lambda: run(
            spark,
            n_rows={"FL": 10_000, "SP": 10_000, "CY": 10_000},
            ran_budget=5.0,
        ),
    )
    show("Fig 8 — quality metrics per baseline/dataset", out)
    for name, grp in out.groupby("dataset"):
        g = grp.set_index("algorithm")
        assert (
            g.loc["SubTab", "cell_coverage"] >= g.loc["NC", "cell_coverage"]
        ), name
