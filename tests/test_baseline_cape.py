"""CAPE baseline (§5.6): regression trend + counterbalances."""
import pandas as pd
import pytest

from repro.baselines.cape import counterbalances


@pytest.fixture()
def wins():
    # monotone-ish trend with one high outlier (2015-16) and low ones
    return pd.DataFrame(
        {
            "season": ["2010-11", "2011-12", "2012-13", "2013-14", "2014-15", "2015-16"],
            "win": [36, 23, 47, 51, 67, 73],
        }
    )


def test_high_question_returns_low_outliers(wins):
    out = counterbalances(wins, "season", "win", "2015-16", "high", k=3)
    assert out
    # every counterbalance must sit below the trend line
    assert all(e.residual < 0 for e in out)


def test_low_question_returns_high_outliers(wins):
    out = counterbalances(wins, "season", "win", "2011-12", "low", k=3)
    assert all(e.residual > 0 for e in out)


def test_question_tuple_excluded(wins):
    out = counterbalances(wins, "season", "win", "2015-16", "high", k=10)
    assert all(e.group["season"] != "2015-16" for e in out)


def test_k_limits_output(wins):
    assert len(counterbalances(wins, "season", "win", "2015-16", "high", k=2)) == 2


def test_ranked_by_residual_magnitude(wins):
    out = counterbalances(wins, "season", "win", "2015-16", "high", k=3)
    mags = [abs(e.residual) for e in out]
    assert mags == sorted(mags, reverse=True)


def test_bad_direction(wins):
    with pytest.raises(ValueError):
        counterbalances(wins, "season", "win", "2015-16", "sideways")


def test_single_row():
    pdf = pd.DataFrame({"g": ["a"], "v": [1.0]})
    assert counterbalances(pdf, "g", "v", "a", "high") == []


def test_strongest_low_outlier_first(wins):
    out = counterbalances(wins, "season", "win", "2015-16", "high", k=1)
    assert out[0].group["season"] == "2011-12"
