"""Table 6 — downstream forecasting RMSE/MAE on Yahoo-A4-like data."""
from _common import arg_n_series, get_spark, show

from repro.experiments.tables import table6

if __name__ == "__main__":
    spark = get_spark("table6")
    show("Table 6: forecasting", table6(spark, n_series=arg_n_series(20)))
    spark.stop()
