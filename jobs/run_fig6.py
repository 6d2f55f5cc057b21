"""Job: reproduce Fig 6 (session replay, % next-query fragments, CY)."""
from _common import emit, get_spark


def main(spark):
    from repro.experiments.fig6_sessions import run

    pdf = run(spark, n_rows=30_000, n_sessions=122)
    return emit(spark, pdf, "Fig 6 — captured next-query fragments (CY)")


if __name__ == "__main__":
    spark = get_spark("fig6")
    main(spark)
    spark.stop()
