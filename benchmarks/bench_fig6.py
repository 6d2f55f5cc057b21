"""Benchmark + reproduction of Fig 6 (session replay on CY)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from bench_common import once, show


def test_fig6_sessions(spark, benchmark):
    from repro.experiments.fig6_sessions import run

    out = once(
        benchmark,
        lambda: run(
            spark, n_rows=10_000, n_sessions=30, ran_budget=0.05
        ),
    )
    show("Fig 6 — % captured next-query fragments (CY)", out)
    st = out[out.algorithm == "SubTab"].set_index("width")["pct_captured"]
    assert st[7] >= st[3]  # wider sub-tables capture more (paper trend)
