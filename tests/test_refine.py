"""Numeric refinement (§3.4) and Prop. 3.1 recall monotonicity."""
import numpy as np
import pandas as pd
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.pattern import Pattern, Predicate
from repro.core.refine import numeric_fragments, refinements


@pytest.fixture()
def pdf():
    rng = np.random.default_rng(0)
    return pd.DataFrame({"pts": rng.integers(0, 50, 200), "mins": rng.random(200) * 48})


def test_fragments_are_interior_quantiles(pdf):
    frags = numeric_fragments(pdf, ["pts"], 4)
    assert len(frags["pts"]) == 3  # quartile boundaries, min/max excluded
    assert frags["pts"] == sorted(frags["pts"])


def test_fragments_empty_column():
    frags = numeric_fragments(pd.DataFrame({"x": [np.nan, np.nan]}), ["x"], 4)
    assert frags["x"] == []


def test_fragments_n_frag_3(pdf):
    assert len(numeric_fragments(pdf, ["pts"], 3)["pts"]) == 2


def test_refinements_count(pdf):
    frags = numeric_fragments(pdf, ["pts", "mins"], 4)
    refs = refinements(Pattern(), frags, attr_num=3)
    # 2 attrs × 3 boundaries × 2 ops
    assert len(refs) == 12


def test_refinements_skip_constrained_attr(pdf):
    frags = numeric_fragments(pdf, ["pts", "mins"], 4)
    base = Pattern((Predicate("pts", ">=", 10),))
    refs = refinements(base, frags, attr_num=3)
    assert all(r.pred_on("mins") is not None for r in refs)
    assert len(refs) == 6


def test_attr_num_limit(pdf):
    frags = numeric_fragments(pdf, ["pts", "mins"], 4)
    base = Pattern((Predicate("pts", ">=", 10),))
    assert refinements(base, frags, attr_num=1) == []


def test_refinements_are_refinements(pdf):
    frags = numeric_fragments(pdf, ["pts"], 4)
    base = Pattern((Predicate("mins", "<=", 30),))
    for r in refinements(base, {"pts": frags["pts"]}, attr_num=3):
        assert r.is_refinement_of(base)


@settings(max_examples=30, deadline=None)
@given(
    thr=st.integers(min_value=0, max_value=50),
    op=st.sampled_from(["<=", ">="]),
    seed=st.integers(min_value=0, max_value=10),
)
def test_prop_3_1_recall_monotone(thr, op, seed):
    """A refinement never matches more rows than its base (Prop. 3.1)."""
    rng = np.random.default_rng(seed)
    pdf = pd.DataFrame(
        {"team": rng.choice(["GSW", "CLE"], 100), "pts": rng.integers(0, 50, 100)}
    )
    base = Pattern((Predicate("team", "=", "GSW"),))
    ref = base.with_pred(Predicate("pts", op, thr))
    assert ref.pandas_mask(pdf).sum() <= base.pandas_mask(pdf).sum()
