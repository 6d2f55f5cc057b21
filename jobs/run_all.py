"""Job: run every evaluation harness and print all result tables."""
from _common import get_spark

import run_fig8, run_fig9, run_fig10, run_fig6, run_fig7, run_table1

if __name__ == "__main__":
    spark = get_spark("run_all")
    for mod in (run_fig8, run_fig9, run_fig10, run_table1, run_fig6, run_fig7):
        mod.main(spark)
    spark.stop()
