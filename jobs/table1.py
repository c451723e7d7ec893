"""Table 1 — single-period detection precision (synthetic sin + CRAN-like)."""
from _common import arg_n_series, get_spark, show

from repro.experiments.tables import table1

if __name__ == "__main__":
    spark = get_spark("table1")
    show("Table 1: single-period precision",
         table1(spark, n_series=arg_n_series(50)))
    spark.stop()
