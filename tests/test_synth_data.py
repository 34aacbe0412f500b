"""Tests for the synthetic ads dataset generator (the paper's dataset
substitute) — structure, determinism, marginals, dynamics, correlation."""
import numpy as np
import pandas as pd
import pytest

from repro.synth_data import (
    ADS_DIMS,
    ADS_MEASURES,
    ads_pandas,
    daily_factor,
    dim_probs,
    random_constraint,
)
from tests.conftest import DAYS, SEED, SF


class TestSchema:
    def test_row_count(self, ads_pdf):
        assert len(ads_pdf) == int(150_000 * SF) * DAYS

    def test_columns(self, ads_pdf):
        expected = {"t", *ADS_DIMS, *ADS_MEASURES}
        assert set(ads_pdf.columns) == expected

    def test_eleven_dimensions_four_measures(self):
        assert len(ADS_DIMS) == 11 and len(ADS_MEASURES) == 4

    def test_dims_within_cardinality(self, ads_pdf):
        for dim, card in ADS_DIMS.items():
            v = ads_pdf[dim]
            assert v.min() >= 0 and v.max() < card

    def test_measures_strictly_positive_integers(self, ads_pdf):
        for m in ADS_MEASURES:
            assert ads_pdf[m].min() >= 1
            assert pd.api.types.is_integer_dtype(ads_pdf[m])

    def test_days_dense(self, ads_pdf):
        assert sorted(ads_pdf["t"].unique()) == list(range(DAYS))

    def test_rows_per_day_constant(self, ads_pdf):
        per_day = ads_pdf.groupby("t").size()
        assert per_day.nunique() == 1


class TestDeterminism:
    def test_same_seed_same_data(self):
        a = ads_pandas(sf=0.002, days=3, seed=42)
        b = ads_pandas(sf=0.002, days=3, seed=42)
        pd.testing.assert_frame_equal(a, b)

    def test_different_seed_different_data(self):
        a = ads_pandas(sf=0.002, days=3, seed=1)
        b = ads_pandas(sf=0.002, days=3, seed=2)
        assert not a["impression"].equals(b["impression"])

    def test_spark_matches_pandas(self, ads_df, ads_pdf):
        got = ads_df.groupBy().sum("impression").first()[0]
        assert got == ads_pdf["impression"].sum()


class TestMarginals:
    def test_dim_probs_sum_to_one(self):
        for dim in ADS_DIMS:
            assert dim_probs(dim).sum() == pytest.approx(1.0)

    def test_dim_probs_decreasing(self):
        for dim in ADS_DIMS:
            p = dim_probs(dim)
            assert np.all(np.diff(p) <= 0)

    def test_empirical_marginals_match_mixture(self, ads_pdf):
        # Every dim's observed marginal must match the analytic mixture
        # (independent component + segment-induced component).
        from repro.synth_data import dim_marginal

        for dim in ADS_DIMS:
            emp = np.zeros(ADS_DIMS[dim])
            vc = ads_pdf[dim].value_counts(normalize=True)
            emp[vc.index] = vc.to_numpy()
            assert np.allclose(emp, dim_marginal(dim), atol=0.02), dim

    def test_dims_deviate_from_independence(self, ads_pdf):
        # The latent segment correlates dimensions: the age×marital joint
        # must not factorize (this is what makes PIM biased).
        joint = pd.crosstab(ads_pdf["age_group"], ads_pdf["marital"], normalize=True)
        indep = np.outer(
            ads_pdf["age_group"].value_counts(normalize=True).sort_index(),
            ads_pdf["marital"].value_counts(normalize=True).sort_index(),
        )
        assert np.abs(joint.to_numpy() - indep).max() > 0.01


class TestMeasures:
    def test_impression_heavy_tailed(self, ads_pdf):
        imp = ads_pdf["impression"]
        assert imp.mean() > 2 * imp.median()  # right-skewed
        assert imp.max() > 30 * imp.mean()    # long tail

    def test_click_correlated_with_impression(self, ads_pdf):
        c = np.corrcoef(
            np.log(ads_pdf["impression"]), np.log(ads_pdf["click"])
        )[0, 1]
        assert c > 0.7

    def test_cart_correlated_with_click(self, ads_pdf):
        c = np.corrcoef(np.log(ads_pdf["click"]), np.log(ads_pdf["cart"]))[0, 1]
        assert c > 0.5

    def test_favorite_weakest_link_to_impression(self, ads_pdf):
        c_fav = np.corrcoef(np.log(ads_pdf["impression"]), np.log(ads_pdf["favorite"]))[0, 1]
        c_clk = np.corrcoef(np.log(ads_pdf["impression"]), np.log(ads_pdf["click"]))[0, 1]
        assert c_fav < c_clk

    def test_click_never_exceeds_impression_plus_one(self, ads_pdf):
        assert (ads_pdf["click"] <= ads_pdf["impression"] + 1).all()


class TestDailyFactor:
    def test_deterministic(self):
        assert np.allclose(daily_factor(50, seed=3), daily_factor(50, seed=3))

    def test_positive(self):
        assert (daily_factor(200, seed=SEED) > 0).all()

    def test_has_upward_trend(self):
        f = daily_factor(200, seed=SEED)
        assert f[150:].mean() > f[:50].mean()

    def test_weekly_seasonality_present(self, ads_pdf):
        daily = ads_pdf.groupby("t")["impression"].sum().to_numpy().astype(float)
        detr = daily / np.convolve(daily, np.ones(7) / 7, mode="same")
        by_dow = np.array([detr[d::7].mean() for d in range(7)])
        assert by_dow.max() / by_dow.min() > 1.1

    def test_aggregate_series_tracks_factor(self, ads_pdf):
        daily = ads_pdf.groupby("t")["impression"].sum().to_numpy().astype(float)
        f = daily_factor(DAYS, seed=SEED)
        c = np.corrcoef(daily, f)[0, 1]
        assert c > 0.8


class TestRandomConstraint:
    @pytest.mark.parametrize("target", [0.005, 0.01, 0.05, 0.1])
    def test_predicted_close_to_target(self, target):
        for seed in range(10):
            _, pred = random_constraint(target, seed=seed)
            assert 0.3 * target <= pred <= 3.0 * target

    def test_deterministic(self):
        assert random_constraint(0.05, seed=9) == random_constraint(0.05, seed=9)

    def test_sql_parses_against_data(self, ads_pdf):
        import duckdb

        for seed in range(5):
            where, pred = random_constraint(0.05, seed=seed)
            frac = duckdb.sql(
                f"SELECT count(*)::DOUBLE / (SELECT count(*) FROM ads_pdf) "
                f"FROM ads_pdf WHERE {where}"
            ).fetchone()[0]
            # empirical within 2.5x of the analytic prediction
            assert 0.4 <= frac / pred <= 2.5

    def test_max_dims_respected(self):
        for seed in range(10):
            where, _ = random_constraint(0.05, seed=seed, max_dims=2)
            assert where.count(" AND ") <= 1
