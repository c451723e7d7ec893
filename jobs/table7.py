"""Tables 7 & 8 — running time and F1 vs series length (500/1000/2000)."""
from _common import arg_n_series, get_spark, show

from repro.experiments.tables import table78

if __name__ == "__main__":
    spark = get_spark("table78")
    timing, f1 = table78(spark, n_series=arg_n_series(30))
    show("Table 7: mean running time (s/series)", timing)
    show("Table 8: F1 (±2%) vs length", f1)
    spark.stop()
