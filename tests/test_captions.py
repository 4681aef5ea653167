"""Tests for the NL caption templates (paper §3.7, Fig. 2)."""
from repro.core.captions import diversity_caption, exceptionality_caption


def _exc(**kw):
    defaults = dict(
        op="filter", column="decade", attr="decade", method="frequency",
        via=None, label="2010", share_in=0.035, share_out=0.61,
        interestingness=0.56, std_contribution=1.69,
    )
    defaults.update(kw)
    return exceptionality_caption(**defaults)


def _div(**kw):
    defaults = dict(
        column="loudness", attr="year", method="many_to_one", via="decade",
        label="1990", set_mean=-10.91, overall_mean=-8.4, overall_std=1.5,
        interestingness=0.13, std_contribution=1.69,
    )
    defaults.update(kw)
    return diversity_caption(**defaults)


class TestExceptionalityCaption:
    def test_paper_example_shares(self):
        c = _exc()
        assert "61.0%" in c and "3.5%" in c
        assert "decade" in c and "2010" in c

    def test_ratio_direction_up(self):
        assert "more frequent" in _exc()

    def test_ratio_direction_down(self):
        c = _exc(share_in=0.6, share_out=0.1)
        assert "less frequent" in c

    def test_exclusive_set(self):
        c = _exc(share_in=0.0, share_out=0.2)
        assert "exclusive" in c

    def test_numeric_label_phrase(self):
        c = _exc(method="numeric", label="[1990, 2023]")
        assert "in [1990, 2023]" in c

    def test_many_to_one_phrase(self):
        c = _exc(method="many_to_one", via="decade", attr="year")
        assert "'decade'" in c and "grouping 'year'" in c

    def test_mentions_operation(self):
        assert "filter" in _exc()
        assert "join" in _exc(op="join")


class TestDiversityCaption:
    def test_paper_example(self):
        c = _div()
        assert "loudness" in c and "1990" in c
        assert "below" in c  # -10.91 is below the overall -8.4

    def test_above_direction(self):
        c = _div(set_mean=-6.0)
        assert "above" in c

    def test_sigma_distance(self):
        c = _div()  # (-10.91 + 8.4)/1.5 = -1.67 sigma
        assert "1.7 standard deviations" in c

    def test_zero_std_fallback(self):
        c = _div(overall_std=0.0)
        assert "compared to the overall mean" in c
