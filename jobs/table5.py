"""Table 5 — ablation study (σ²=2, η=0.2 synthetic sin)."""
from _common import arg_n_series, get_spark, show

from repro.experiments.tables import table5

if __name__ == "__main__":
    spark = get_spark("table5")
    show("Table 5: ablations", table5(spark, n_series=arg_n_series(50)))
    spark.stop()
