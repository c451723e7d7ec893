"""Table 3 — multi-period F1 on square/triangle waves."""
from _common import arg_n_series, get_spark, show

from repro.experiments.tables import table3

if __name__ == "__main__":
    spark = get_spark("table3")
    show("Table 3: non-sinusoidal multi-period F1",
         table3(spark, n_series=arg_n_series(50)))
    spark.stop()
