"""Job: reproduce Table 1 (simulated user study) — SubTab vs RAN vs NC."""
from _common import emit, get_spark


def main(spark):
    from repro.experiments.table1_user_study import run

    pdf = run(
        spark,
        n_rows={"SP": 20_000, "FL": 20_000, "BL": 20_000},
        ran_budget=5.0,
    )
    return emit(spark, pdf, "Table 1 — user study (simulated analysts)")


if __name__ == "__main__":
    spark = get_spark("table1")
    main(spark)
    spark.stop()
