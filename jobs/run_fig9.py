"""Job: reproduce Fig 9 (pre-processing vs selection runtime, 6 datasets)."""
from _common import emit, get_spark


def main(spark):
    from repro.experiments.fig9_runtime import run

    pdf = run(spark)
    return emit(spark, pdf, "Fig 9 — SubTab running time per dataset")


if __name__ == "__main__":
    spark = get_spark("fig9")
    main(spark)
    spark.stop()
