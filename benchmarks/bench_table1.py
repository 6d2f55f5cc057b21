"""Benchmark + reproduction of Table 1 (simulated user study)."""
import sys, os
sys.path.insert(0, os.path.dirname(__file__))
from bench_common import once, show


def test_table1_user_study(spark, benchmark):
    from repro.experiments.table1_user_study import run

    out = once(
        benchmark,
        lambda: run(
            spark,
            n_rows={"SP": 8_000, "FL": 8_000, "BL": 8_000},
            ran_budget=2.0,
        ),
    )
    show("Table 1 — user study (simulated analysts)", out)
    sub = out.set_index("baseline")
    # Paper shape: SubTab ≫ RAN ≫ NC on correct insights.
    assert (
        sub.loc["SubTab", "avg_correct_insights"]
        >= sub.loc["NC", "avg_correct_insights"]
    )
