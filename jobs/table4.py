"""Table 4 — detected periods on the 6 cloud-like monitoring datasets."""
from _common import get_spark, show

from repro.experiments.tables import table4

if __name__ == "__main__":
    spark = get_spark("table4")
    show("Table 4: cloud datasets detections", table4(spark))
    spark.stop()
