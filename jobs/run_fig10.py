"""Job: reproduce Fig 10 (parameter-tuning sweeps, FL+SP average)."""
from _common import emit, get_spark


def main(spark):
    from repro.experiments.fig10_param_tuning import run

    pdf = run(spark)
    return emit(spark, pdf, "Fig 10 — cell coverage vs mining parameters")


if __name__ == "__main__":
    spark = get_spark("fig10")
    main(spark)
    spark.stop()
