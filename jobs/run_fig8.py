"""Job: reproduce Fig 8 (cellCov/diversity/combined, FL+SP+CY)."""
from _common import emit, get_spark


def main(spark):
    from repro.experiments.fig8_quality import run

    pdf = run(
        spark,
        n_rows={"FL": 30_000, "SP": 30_000, "CY": 30_000},
        ran_budget=10.0,
    )
    return emit(spark, pdf, "Fig 8 — quality metrics per baseline/dataset")


if __name__ == "__main__":
    spark = get_spark("fig8")
    main(spark)
    spark.stop()
