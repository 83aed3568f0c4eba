"""LCA pattern-candidate generation (§3.2)."""
import pandas as pd

from repro.core.lca import lca_candidates
from repro.core.pattern import Pattern, Predicate


def _pdf():
    return pd.DataFrame(
        {
            "team": ["GSW", "GSW", "GSW", "CLE"],
            "pos": ["G", "G", "F", "F"],
        }
    )


def test_candidates_nonempty():
    assert lca_candidates(_pdf(), ["team", "pos"])


def test_most_frequent_first():
    cands = lca_candidates(_pdf(), ["team", "pos"])
    # team=GSW pairs across combos (GSW,G)×(GSW,F) carry weight 2; every
    # other pattern's pair weight is ≤ 1 → GSW strictly first.
    assert cands[0] == Pattern((Predicate("team", "=", "GSW"),))


def test_agreement_pattern_present():
    cands = lca_candidates(_pdf(), ["team", "pos"])
    both = Pattern((Predicate("pos", "=", "G"), Predicate("team", "=", "GSW")))
    assert both in cands


def test_empty_pattern_excluded():
    assert Pattern() not in lca_candidates(_pdf(), ["team", "pos"])


def test_no_cat_attrs():
    assert lca_candidates(_pdf(), []) == []


def test_empty_frame():
    assert lca_candidates(_pdf().iloc[0:0], ["team"]) == []


def test_max_patterns_cap():
    pdf = pd.DataFrame({"a": [str(i) for i in range(10)] * 2, "b": list("xy") * 10})
    assert len(lca_candidates(pdf, ["a", "b"], max_patterns=3)) == 3


def test_nan_values_never_in_patterns():
    pdf = pd.DataFrame({"a": [None, None, "x", "x"]})
    cands = lca_candidates(pdf, ["a"])
    for p in cands:
        for pred in p.preds:
            assert pred.value is not None and pred.value == pred.value


def test_single_row_no_pairs():
    pdf = pd.DataFrame({"a": ["x"]})
    # a single row has no distinct pair and C(1,2)=0 diagonal weight
    assert lca_candidates(pdf, ["a"]) == []


def test_only_equality_predicates():
    for p in lca_candidates(_pdf(), ["team", "pos"]):
        assert all(pred.op == "=" for pred in p.preds)
