"""Tests for the synthetic dataset generators (DESIGN.md §2 substitutions).

These assert the *planted properties* the evaluation relies on, not just
schemas: the generators must make the same columns interesting that the
paper reports for the real data.
"""
import numpy as np
import pandas as pd
import pytest
from repro.metrics.skew import fisher_pearson_skew

from repro.datasets.bank import bank_pdf
from repro.datasets.products import (
    counties_pdf,
    products_pdf,
    sales_pdf,
    stores_pdf,
)
from repro.datasets.spotify import spotify_pdf


class TestSpotify:
    @pytest.fixture(scope="class")
    def pdf(self):
        return spotify_pdf(20000, seed=42)

    def test_schema_20_columns(self, pdf):
        assert len(pdf.columns) == 20

    def test_row_count(self, pdf):
        assert len(pdf) == 20000

    def test_deterministic(self):
        a = spotify_pdf(500, seed=1)
        b = spotify_pdf(500, seed=1)
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_data(self):
        a = spotify_pdf(500, seed=1)
        b = spotify_pdf(500, seed=2)
        assert not a["popularity"].equals(b["popularity"])

    def test_decade_is_many_to_one_with_year(self, pdf):
        assert (pdf.groupby("year")["decade"].nunique() == 1).all()
        assert pdf["decade"].nunique() < pdf["year"].nunique()

    def test_planted_2010s_rare_but_dominant_in_popular(self, pdf):
        share_all = (pdf["decade"] == 2010).mean()
        popular = pdf[pdf["popularity"] > 65]
        share_pop = (popular["decade"] == 2010).mean()
        # Paper Fig. 2a: 3.5% of the dataset vs 61% of the popular songs.
        assert share_all < 0.06
        assert share_pop > 0.45
        assert share_pop / share_all > 8

    def test_planted_1990s_quieter(self, pdf):
        by_decade = pdf.groupby("decade")["loudness"].mean()
        assert by_decade.idxmin() == 1990
        assert by_decade.drop(1990).mean() - by_decade[1990] > 2.5

    def test_danceability_tight(self, pdf):
        # Paper Ex. 3.2: danceability CV ~ 0.04 vs loudness CV ~ 0.13.
        by_year = pdf[pdf["year"] >= 1990].groupby("year").agg(
            loud=("loudness", "mean"), dance=("danceability", "mean")
        )
        cv = lambda s: s.std(ddof=1) / abs(s.mean())  # noqa: E731
        assert cv(by_year["dance"]) < 0.05
        assert cv(by_year["loud"]) > 2 * cv(by_year["dance"])

    def test_planted_acoustic_penalty(self, pdf):
        acoustic = pdf[pdf["acousticness"] > 0.5]["popularity"].mean()
        rest = pdf[pdf["acousticness"] <= 0.5]["popularity"].mean()
        assert rest - acoustic > 5

    def test_followers_highly_skewed(self, pdf):
        # Paper §4.1: top-1 column skewness 10.16 for Spotify.
        assert fisher_pearson_skew(pdf["followers"]) > 5

    def test_value_ranges(self, pdf):
        assert pdf["popularity"].between(0, 100).all()
        assert pdf["danceability"].between(0, 1).all()
        assert pdf["year"].between(1950, 2023).all()


class TestBank:
    @pytest.fixture(scope="class")
    def pdf(self):
        return bank_pdf(8000, seed=7)

    def test_schema_21_columns(self, pdf):
        assert len(pdf.columns) == 21

    def test_attrition_rate(self, pdf):
        rate = (pdf["Attrition_Flag"] == "Attrited Customer").mean()
        assert 0.12 < rate < 0.20  # Kaggle original: ~16%

    def test_planted_churn_inactivity(self, pdf):
        churned = pdf[pdf["Attrition_Flag"] == "Attrited Customer"]
        stayed = pdf[pdf["Attrition_Flag"] == "Existing Customer"]
        assert (
            churned["Months_Inactive_Count_Last_Year"].mean()
            > stayed["Months_Inactive_Count_Last_Year"].mean() + 0.5
        )

    def test_planted_churn_fewer_transactions(self, pdf):
        churned = pdf[pdf["Attrition_Flag"] == "Attrited Customer"]
        stayed = pdf[pdf["Attrition_Flag"] == "Existing Customer"]
        assert churned["Total_Trans_Ct"].mean() < stayed["Total_Trans_Ct"].mean() - 10

    def test_card_category_skewed(self, pdf):
        assert (pdf["Card_Category"] == "Blue").mean() > 0.85

    def test_credit_used_consistent(self, pdf):
        expected = (pdf["Total_Revolving_Bal"] / pdf["Credit_Limit"]).clip(0, 1)
        assert np.allclose(pdf["Credit_Used"], expected.round(3))

    def test_deterministic(self):
        pd.testing.assert_frame_equal(bank_pdf(300, seed=3), bank_pdf(300, seed=3))


class TestProducts:
    @pytest.fixture(scope="class")
    def products(self):
        return products_pdf(800, seed=11)

    @pytest.fixture(scope="class")
    def sales(self):
        return sales_pdf(30000, 800)

    def test_products_16_columns(self, products):
        assert len(products.columns) == 16

    def test_sales_17_columns(self, sales):
        assert len(sales.columns) == 17

    def test_sales_reference_products(self, products, sales):
        assert sales["item"].isin(products["item"]).all()

    def test_planted_dead_products(self, products, sales):
        # ~25% of products never sell -> the join view deviates.
        sold = sales["item"].nunique()
        assert sold <= 0.80 * len(products)

    def test_sales_total_extreme_skew(self, sales):
        # Paper §4.1: top-1 skewness 205.89 for this dataset; our scaled
        # lognormal still lands far into "highly skewed" (> 3).
        assert fisher_pearson_skew(sales["total"]) > 3

    def test_vendor_zipf_skew(self, sales):
        counts = sales["vendor"].value_counts()
        assert counts.iloc[0] > 4 * counts.iloc[9]

    def test_planted_small_bottles_schnapps(self, sales):
        small = sales[sales["liter_size"] <= 500]
        base = (sales["category_name"] == "Schnapps").mean()
        boosted = (small["category_name"] == "Schnapps").mean()
        assert boosted > 2 * base

    def test_denormalized_columns_consistent(self, products, sales):
        merged = sales.merge(products, on="item", suffixes=("_s", "_p"))
        assert (merged["vendor_s"] == merged["vendor_p"]).all()
        assert (merged["pack_s"] == merged["pack_p"]).all()

    def test_lookup_tables(self):
        st = stores_pdf(50)
        co = counties_pdf(20)
        assert len(st) == 50 and st["store"].is_unique
        assert len(co) == 20 and co["county"].is_unique
