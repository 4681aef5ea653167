"""Tests for the three reimplemented baselines (paper §4.1)."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.io_baseline import io_explain
from repro.baselines.rath import RathOOMError, rath_insights
from repro.baselines.seedb import UnsupportedStepError, seedb_views
from repro.core.model import Aggregation, FilterStep, GroupByStep
from repro.workload.queries import make_bundle


@pytest.fixture(scope="module")
def spotify_bundle(spark):
    return make_bundle(spark, "spotify", scale="test")


@pytest.fixture(scope="module")
def filter_step(spotify_bundle):
    return FilterStep(spotify_bundle.spark_tables["spotify"], "popularity > 65")


@pytest.fixture(scope="module")
def groupby_step(spotify_bundle):
    return GroupByStep(
        spotify_bundle.spark_tables["spotify"],
        ["year"],
        [Aggregation("mean", "loudness", "mean_loud")],
    )


class TestIO:
    def test_ranks_planted_column_top(self, filter_step):
        exps = io_explain(filter_step, top_k=3)
        assert exps[0].column in ("decade", "year")

    def test_descending_scores(self, filter_step):
        exps = io_explain(filter_step, top_k=5)
        scores = [e.interestingness for e in exps]
        assert scores == sorted(scores, reverse=True)

    def test_caption_names_column(self, filter_step):
        exps = io_explain(filter_step, top_k=1)
        assert exps[0].column in exps[0].caption

    def test_groupby_supported(self, groupby_step):
        exps = io_explain(groupby_step, top_k=2)
        assert exps and exps[0].column == "mean_loud"


class TestSeeDB:
    def test_rejects_groupby(self, groupby_step):
        with pytest.raises(UnsupportedStepError):
            seedb_views(groupby_step)

    def test_returns_topk_views(self, filter_step):
        views = seedb_views(filter_step, top_k=3)
        assert len(views) == 3
        utils = [v.utility for v in views]
        assert utils == sorted(utils, reverse=True)
        assert all(v.utility >= 0 for v in views)

    def test_planted_dimension_found(self, filter_step):
        # The popularity filter shifts the decade mix — a decade-grouped
        # view should deviate strongly.
        views = seedb_views(filter_step, top_k=5)
        assert any(v.dimension in ("decade", "genre", "key", "mode") for v in views)

    def test_identity_filter_low_utility(self, spark):
        pdf = pd.DataFrame(
            {"g": list("ab") * 50, "v": np.arange(100, dtype=float)}
        )
        step = FilterStep(spark.createDataFrame(pdf), "v >= 0")
        views = seedb_views(step, top_k=3)
        assert all(v.utility < 1e-6 for v in views)


class TestRath:
    def test_insights_on_output_view(self, groupby_step):
        insights = rath_insights(groupby_step, top_k=3)
        assert 1 <= len(insights) <= 3
        scores = [i.score for i in insights]
        assert scores == sorted(scores, reverse=True)

    def test_insight_kinds_valid(self, filter_step):
        insights = rath_insights(filter_step, top_k=5)
        assert insights
        assert {i.kind for i in insights} <= {"outstanding_1", "attribution", "trend"}

    def test_memory_budget_ooms(self, filter_step):
        # Mirrors the paper's RATH OOM at 3M rows / 16 GB (§4.3): a tiny
        # budget must trip the same guard.
        with pytest.raises(RathOOMError):
            rath_insights(filter_step, memory_budget_bytes=10_000)

    def test_trend_detected(self, spark):
        pdf = pd.DataFrame(
            {"x": np.arange(50, dtype=float), "y": np.arange(50, dtype=float) * 2 + 1}
        )
        step = FilterStep(spark.createDataFrame(pdf), "x >= 0")
        insights = rath_insights(step, top_k=10, max_dim_cardinality=60)
        assert any(i.kind == "trend" and i.score > 0.9 for i in insights)
