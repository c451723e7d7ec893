"""Detection scoring: tolerance matching + Spark SQL aggregation.

Per-series matching (greedy, pandas inside ``applyInPandas``): each true
period is matched to the nearest unused detected period within the
tolerance (±0% = exact integer match; ±q% = |det − true| ≤ q·true,
minimum slack 1 sample so a ±2% band is non-degenerate for short
periods, as in the paper's "2% tolerance interval around the ground
truth").  Matched pairs are TP; unmatched detections FP; unmatched
truths FN.

The aggregation to precision/recall/F1 per (dataset, algo) is a Spark
SQL query; tests oracle-check it against DuckDB via
``repro.oracle.assert_equivalent``.
"""
from __future__ import annotations

import json

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql.types import (DoubleType, IntegerType, StringType,
                               StructField, StructType)

MATCH_SCHEMA = StructType([
    StructField("dataset", StringType()),
    StructField("series_id", IntegerType()),
    StructField("algo", StringType()),
    StructField("tol", DoubleType()),
    StructField("tp", IntegerType()),
    StructField("fp", IntegerType()),
    StructField("fn", IntegerType()),
])

AGG_SQL = """
SELECT dataset, algo, tol,
       CAST(SUM(tp) AS DOUBLE) AS tp,
       CAST(SUM(fp) AS DOUBLE) AS fp,
       CAST(SUM(fn) AS DOUBLE) AS fn,
       CASE WHEN SUM(tp) + SUM(fp) = 0 THEN 0.0
            ELSE SUM(tp) / CAST(SUM(tp) + SUM(fp) AS DOUBLE) END AS precision,
       CASE WHEN SUM(tp) + SUM(fn) = 0 THEN 0.0
            ELSE SUM(tp) / CAST(SUM(tp) + SUM(fn) AS DOUBLE) END AS recall,
       CASE WHEN 2 * SUM(tp) + SUM(fp) + SUM(fn) = 0 THEN 0.0
            ELSE 2.0 * SUM(tp) / CAST(2 * SUM(tp) + SUM(fp) + SUM(fn) AS DOUBLE)
       END AS f1
FROM {table}
GROUP BY dataset, algo, tol
ORDER BY dataset, algo, tol
"""


def match_counts(detected: list[int], truth: list[int], tol: float
                 ) -> tuple[int, int, int]:
    """Greedy tolerance matching → (tp, fp, fn)."""
    remaining = sorted(detected)
    tp = 0
    for tr in sorted(truth):
        slack = 0 if tol == 0 else max(1.0, tol * tr)
        best, best_d = None, None
        for d in remaining:
            dd = abs(d - tr)
            if dd <= slack and (best_d is None or dd < best_d):
                best, best_d = d, dd
        if best is not None:
            remaining.remove(best)
            tp += 1
    fp = len(remaining)
    fn = len(truth) - tp
    return tp, fp, fn


def _match_fn(tols: tuple[float, ...]):
    def match_group(pdf: pd.DataFrame) -> pd.DataFrame:
        out = []
        for _, row in pdf.iterrows():
            det = json.loads(row["periods"])
            tru = json.loads(row["true_periods"])
            for tol in tols:
                tp, fp, fn = match_counts(det, tru, tol)
                out.append((row["dataset"], int(row["series_id"]),
                            row["algo"], float(tol), tp, fp, fn))
        return pd.DataFrame(out, columns=[f.name for f in MATCH_SCHEMA.fields])
    return match_group


def match_df(spark: SparkSession, det: DataFrame, truth: pd.DataFrame,
             tols: tuple[float, ...] = (0.0, 0.02)) -> DataFrame:
    """Join detections with truth and compute per-series TP/FP/FN rows."""
    tdf = spark.createDataFrame(
        truth.rename(columns={"periods": "true_periods"}))
    joined = det.join(tdf, on=["dataset", "series_id"], how="inner")
    return (joined.groupBy("dataset", "series_id", "algo")
            .applyInPandas(_match_fn(tuple(tols)), schema=MATCH_SCHEMA))


def score(spark: SparkSession, det: DataFrame, truth: pd.DataFrame,
          tols: tuple[float, ...] = (0.0, 0.02)) -> DataFrame:
    """Precision/recall/F1 per (dataset, algo, tol) via Spark SQL."""
    m = match_df(spark, det, truth, tols)
    m.createOrReplaceTempView("match_counts_tbl")
    return spark.sql(AGG_SQL.format(table="match_counts_tbl"))
