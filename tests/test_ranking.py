"""NDCG [24] and Kendall-tau distance [28] (used by §5.4, §6.3)."""
import pytest

from repro.baselines.ranking import (
    dcg,
    kendall_tau_distance,
    ndcg,
    ndcg_of_ranking,
    top_k_recall,
)


def test_dcg_positional_discount():
    assert dcg([3, 2, 1]) == pytest.approx(
        3 / 1 + 2 / 1.58496 + 1 / 2, rel=1e-3
    )


def test_ndcg_perfect_order():
    assert ndcg([5, 4, 3, 2]) == pytest.approx(1.0)


def test_ndcg_worst_order_below_one():
    assert ndcg([1, 2, 3, 4]) < 1.0


def test_ndcg_empty():
    assert ndcg([]) == 1.0


def test_ndcg_all_zero():
    assert ndcg([0, 0]) == 1.0


def test_ndcg_of_ranking_lookup():
    rel = {"a": 3.0, "b": 1.0}
    assert ndcg_of_ranking(["a", "b"], rel) == pytest.approx(1.0)
    assert ndcg_of_ranking(["b", "a"], rel) < 1.0


def test_ndcg_of_ranking_missing_items_score_zero():
    # unknown items contribute 0 relevance, and the ideal DCG comes from
    # the relevance table — surfacing nothing relevant scores 0, not 1.
    assert ndcg_of_ranking(["zzz"], {"a": 1.0}) == pytest.approx(0.0)
    assert 0.0 < ndcg_of_ranking(["zzz", "a"], {"a": 1.0}) < 1.0


def test_ndcg_of_ranking_empty_produced():
    assert ndcg_of_ranking([], {"a": 1.0}) == 1.0


def test_kendall_identical():
    assert kendall_tau_distance([1, 2, 3], [10, 20, 30]) == 0


def test_kendall_reversed():
    assert kendall_tau_distance([1, 2, 3], [3, 2, 1]) == 3


def test_kendall_ties_not_discordant():
    assert kendall_tau_distance([1, 1, 2], [2, 1, 3]) == 0


def test_kendall_length_mismatch():
    with pytest.raises(ValueError):
        kendall_tau_distance([1], [1, 2])


def test_top_k_recall_full():
    assert top_k_recall(["a", "b", "c"], ["a", "b", "c"], 3) == 1.0


def test_top_k_recall_partial():
    assert top_k_recall(["a", "x", "y"], ["a", "b", "c"], 3) == pytest.approx(1 / 3)


def test_top_k_recall_k_zero():
    assert top_k_recall([], [], 0) == 1.0
