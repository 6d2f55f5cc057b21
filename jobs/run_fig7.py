"""Job: reproduce Fig 7 (quality + runtime of the slow baselines, FL)."""
from _common import emit, get_spark


def main(spark):
    from repro.experiments.fig7_slow_baselines import run

    pdf = run(spark, n_rows=20_000, greedy_budget=90.0, mab_budget=45.0)
    return emit(spark, pdf, "Fig 7 — slow baselines (FL)")


if __name__ == "__main__":
    spark = get_spark("fig7")
    main(spark)
    spark.stop()
