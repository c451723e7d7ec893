"""Tests for the Spark applyInPandas detection layer."""
import json

import numpy as np
import pytest

from repro import datasets
from repro.core.robust_period import detect as rp_detect
from repro.oracle import assert_equivalent
from repro.sparkrun.detect import (ALGOS, detect_periods, series_df,
                                   timing_summary)


@pytest.fixture(scope="module")
def small_suite():
    return datasets.synthetic_suite(kind="sin", periods=(20, 50, 100),
                                    noise_var=0.1, outlier_ratio=0.01,
                                    n_series=3, seed=0, name="tiny")


class TestRegistry:
    def test_all_algorithms_registered(self):
        expected = {"robust_period", "find_frequency", "sazed_maj",
                    "sazed_opt", "siegel", "autoperiod", "wavelet_fisher",
                    "huber_fisher", "huber_siegel_acf", "nr_robust_period"}
        assert expected == set(ALGOS)

    def test_unknown_algo_raises(self, spark, small_suite):
        data, _ = small_suite
        with pytest.raises(ValueError, match="unknown"):
            detect_periods(spark, data, ["nope"])


class TestSeriesDF:
    def test_schema(self, spark, small_suite):
        data, _ = small_suite
        sdf = series_df(spark, data)
        assert set(sdf.columns) == {"dataset", "series_id", "t", "y"}

    def test_row_count(self, spark, small_suite):
        data, _ = small_suite
        assert series_df(spark, data).count() == len(data)


class TestDetectPeriods:
    def test_output_rows_and_schema(self, spark, small_suite):
        data, _ = small_suite
        det = detect_periods(spark, data, ["siegel", "robust_period"])
        pdf = det.toPandas()
        assert len(pdf) == 6  # 3 series × 2 algos
        assert set(pdf.columns) == {"dataset", "series_id", "algo",
                                    "periods", "n_periods", "elapsed_s"}
        assert (pdf["elapsed_s"] > 0).all()

    def test_matches_local_detection(self, spark, small_suite):
        # The Spark path must produce byte-identical detections to calling
        # the algorithm locally on the same series.
        data, _ = small_suite
        det = detect_periods(spark, data, ["robust_period"]).toPandas()
        for sid in (0, 1, 2):
            y = (data[data.series_id == sid].sort_values("t")["y"]
                 .to_numpy(dtype=float))
            local = sorted(rp_detect(y))
            row = det[det.series_id == sid].iloc[0]
            assert json.loads(row["periods"]) == local

    def test_n_periods_consistent(self, spark, small_suite):
        data, _ = small_suite
        det = detect_periods(spark, data, ["siegel"]).toPandas()
        for _, r in det.iterrows():
            assert r["n_periods"] == len(json.loads(r["periods"]))

    def test_timing_summary_oracle(self, spark, small_suite):
        data, _ = small_suite
        det = detect_periods(spark, data, ["siegel", "sazed_opt"])
        det.cache()
        summary = timing_summary(det)
        assert_equivalent(
            summary,
            """SELECT dataset, algo, AVG(elapsed_s) AS mean_elapsed_s,
                      COUNT(*) AS n_series
               FROM det GROUP BY dataset, algo ORDER BY dataset, algo""",
            det=det.toPandas())
        det.unpersist()

    def test_algorithm_exception_yields_empty(self, spark, small_suite, monkeypatch):
        # A crashing algorithm must produce an empty detection row, not
        # fail the whole Spark job.
        data, _ = small_suite
        import repro.sparkrun.detect as D

        def boom(y):
            raise RuntimeError("kaboom")

        monkeypatch.setitem(D.ALGOS, "sazed_maj", boom)
        det = detect_periods(spark, data[data.series_id == 0], ["sazed_maj"])
        pdf = det.toPandas()
        assert len(pdf) == 1 and json.loads(pdf.iloc[0]["periods"]) == []
