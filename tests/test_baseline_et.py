"""Explanation Tables baseline [19] (§5.5)."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.explanation_tables import (
    ETResult,
    discretize,
    explanation_table,
)


@pytest.fixture()
def pdf():
    rng = np.random.default_rng(2)
    n = 500
    team = rng.choice(["GSW", "CLE", "MIA"], n, p=[0.4, 0.3, 0.3])
    pos = rng.choice(["G", "F"], n)
    outcome = ((team == "GSW") & (rng.random(n) < 0.9)) | (rng.random(n) < 0.05)
    return pd.DataFrame({"team": team, "pos": pos, "won": outcome.astype(int)})


def test_returns_et_result(pdf):
    res = explanation_table(pdf, "won", ["team", "pos"], k=5, sample_size=40)
    assert isinstance(res, ETResult)
    assert res.runtime_s > 0 and res.n_candidates > 0


def test_finds_informative_pattern(pdf):
    res = explanation_table(pdf, "won", ["team", "pos"], k=5, sample_size=60)
    descs = [p.describe() for p in res.patterns]
    assert any("team=GSW" in d for d in descs)


def test_k_bounds_patterns(pdf):
    res = explanation_table(pdf, "won", ["team", "pos"], k=2, sample_size=40)
    assert len(res.patterns) <= 2


def test_quadratic_candidate_growth(pdf):
    small = explanation_table(pdf, "won", ["team", "pos"], k=1, sample_size=16)
    large = explanation_table(pdf, "won", ["team", "pos"], k=1, sample_size=200)
    assert large.n_candidates >= small.n_candidates


def test_deterministic(pdf):
    a = explanation_table(pdf, "won", ["team", "pos"], k=3, sample_size=40, seed=5)
    b = explanation_table(pdf, "won", ["team", "pos"], k=3, sample_size=40, seed=5)
    assert [p.describe() for p in a.patterns] == [p.describe() for p in b.patterns]


def test_discretize_buckets_numeric():
    pdf = pd.DataFrame({"x": np.arange(100.0), "s": ["a"] * 100})
    out = discretize(pdf, ["x"], n_bins=4)
    assert out["x"].nunique() == 4
    assert out["x"].dtype == object


def test_discretize_ignores_constant():
    pdf = pd.DataFrame({"x": [1.0] * 10})
    out = discretize(pdf, ["x"], n_bins=4)
    assert len(out) == 10


def test_empty_outcome_gain():
    pdf = pd.DataFrame({"a": ["x", "y"], "won": [0, 0]})
    res = explanation_table(pdf, "won", ["a"], k=3, sample_size=2)
    assert res.patterns == []
