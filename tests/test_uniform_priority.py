"""Tests for the uniform and priority sampler baselines."""
import numpy as np
import pytest
from pyspark.sql import functions as F

from repro.sampling.base import est_col, sample_fraction
from repro.sampling.priority import priority_sample
from repro.sampling.uniform import uniform_sample
from repro.synth_data import ADS_MEASURES
from tests.conftest import DAYS


class TestUniform:
    def test_rate_respected(self, ads_df):
        s = uniform_sample(ads_df, 0.1, measures=["impression"], seed=0)
        frac = sample_fraction(s, ads_df)
        assert 0.08 <= frac <= 0.12

    def test_calibration_inverse_rate(self, ads_df):
        s = uniform_sample(ads_df, 0.25, measures=["impression"], seed=0)
        pdf = s.select("impression", est_col("impression")).toPandas()
        assert np.allclose(pdf[est_col("impression")], pdf["impression"] / 0.25)

    def test_unbiased_over_seeds(self, ads_df, ads_pdf):
        truth = float(ads_pdf["impression"].sum())
        ests = [
            uniform_sample(ads_df, 0.1, measures=["impression"], seed=s)
            .agg(F.sum(est_col("impression"))).first()[0]
            for s in range(8)
        ]
        assert abs(np.mean(ests) - truth) / truth < 0.1

    def test_all_measures_calibrated(self, ads_df):
        s = uniform_sample(ads_df, 0.1, measures=list(ADS_MEASURES), seed=0)
        for m in ADS_MEASURES:
            assert est_col(m) in s.columns

    @pytest.mark.parametrize("rate", [0.0, -0.5, 1.5])
    def test_rejects_bad_rate(self, ads_df, rate):
        with pytest.raises(ValueError):
            uniform_sample(ads_df, rate, measures=["impression"], seed=0)

    def test_rate_one_keeps_almost_all(self, ads_df):
        s = uniform_sample(ads_df, 1.0, measures=["impression"], seed=0)
        assert s.count() == ads_df.count()


class TestPriority:
    def test_exactly_k_rows_per_day(self, ads_df):
        k = 40
        s = priority_sample(ads_df, k, measure="impression", seed=0)
        per_day = s.groupBy("t").count().toPandas()
        assert (per_day["count"] == k).all()
        assert len(per_day) == DAYS

    def test_keeps_whole_day_when_k_large(self, spark):
        import pandas as pd

        pdf = pd.DataFrame({"t": [0, 0, 0], "impression": [1.0, 2.0, 3.0]})
        df = spark.createDataFrame(pdf)
        s = priority_sample(df, 10, measure="impression", seed=0)
        got = s.select("impression", est_col("impression")).toPandas()
        # All 3 rows kept; τ = 0 → estimator is exact.
        assert len(got) == 3
        assert np.allclose(
            np.sort(got[est_col("impression")]), np.sort(got["impression"])
        )

    def test_estimator_is_max_of_measure_and_tau(self, ads_df):
        s = priority_sample(ads_df, 25, measure="impression", seed=1)
        pdf = s.select("impression", est_col("impression")).toPandas()
        assert (pdf[est_col("impression")] >= pdf["impression"] - 1e-9).all()

    def test_unbiased_total_over_seeds(self, ads_df, ads_pdf):
        truth = float(ads_pdf["impression"].sum())
        ests = [
            priority_sample(ads_df, 60, measure="impression", seed=s)
            .agg(F.sum(est_col("impression"))).first()[0]
            for s in range(8)
        ]
        assert abs(np.mean(ests) - truth) / truth < 0.1

    def test_rstd_near_theoretical_optimum(self, ads_df, ads_pdf):
        """Priority sampling: RSTD ≈ sqrt(1/(k-1)) per day; the full-table
        estimate over D days has RSTD ≈ sqrt(1/(D(k-1)))."""
        truth = float(ads_pdf["impression"].sum())
        k = 50
        errs = [
            (priority_sample(ads_df, k, measure="impression", seed=s)
             .agg(F.sum(est_col("impression"))).first()[0] - truth) / truth
            for s in range(10)
        ]
        rstd = float(np.sqrt(np.mean(np.square(errs))))
        cap = np.sqrt(1.0 / (DAYS * (k - 1)))
        assert rstd <= 3 * cap

    def test_prefers_heavy_rows(self, ads_df, ads_pdf):
        """Weighted sampling: the sample mean measure ≫ population mean."""
        s = priority_sample(ads_df, 30, measure="impression", seed=2)
        samp_mean = s.agg(F.avg("impression")).first()[0]
        assert samp_mean > 3 * ads_pdf["impression"].mean()

    def test_rejects_bad_k(self, ads_df):
        with pytest.raises(ValueError):
            priority_sample(ads_df, 0, measure="impression", seed=0)

    def test_deterministic_given_seed(self, ads_df):
        a = priority_sample(ads_df, 20, measure="impression", seed=3)
        b = priority_sample(ads_df, 20, measure="impression", seed=3)
        sa = a.agg(F.sum(est_col("impression"))).first()[0]
        sb = b.agg(F.sum(est_col("impression"))).first()[0]
        assert sa == pytest.approx(sb)
