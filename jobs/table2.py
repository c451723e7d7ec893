"""Table 2 — multi-period F1 (synthetic sin + Yahoo-like A3/A4)."""
from _common import arg_n_series, get_spark, show

from repro.experiments.tables import table2

if __name__ == "__main__":
    spark = get_spark("table2")
    show("Table 2: multi-period F1",
         table2(spark, n_series=arg_n_series(50)))
    spark.stop()
