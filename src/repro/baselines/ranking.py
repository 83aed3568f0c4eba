"""Ranking-quality metrics used in §5.4 and §6.3: NDCG and Kendall-tau.

``ndcg`` is the normalized discounted cumulative gain [24] of a produced
ranking against graded relevance scores; ``kendall_tau_distance`` is the
pairwise ranking error [28] (number of discordant pairs) the user study
reports as "Avg. Kendall tau rank distance".
"""
from __future__ import annotations

import math
from typing import Sequence


def dcg(relevances: Sequence[float]) -> float:
    """DCG with the standard log2 position discount."""
    return sum(
        rel / math.log2(i + 2) for i, rel in enumerate(relevances)
    )


def ndcg(ranked_relevances: Sequence[float]) -> float:
    """NDCG of a ranking whose i-th item has the given true relevance.

    1.0 ⇔ the ranking sorts items by decreasing relevance.
    """
    if not ranked_relevances:
        return 1.0
    ideal = dcg(sorted(ranked_relevances, reverse=True))
    if ideal == 0:
        return 1.0
    return dcg(ranked_relevances) / ideal


def ndcg_of_ranking(
    produced: Sequence[object], relevance: dict[object, float]
) -> float:
    """NDCG of ``produced`` (best first) against a relevance lookup.

    The ideal DCG is computed from the *relevance table's* best items (not
    from the produced list), so a ranking that surfaces none of the
    relevant items scores 0 rather than trivially 1.
    """
    if not produced:
        return 1.0
    rels = [relevance.get(x, 0.0) for x in produced]
    pool = sorted(relevance.values(), reverse=True)[: len(rels)]
    ideal = dcg(pool)
    if ideal == 0:
        return 1.0
    return dcg(rels) / ideal


def kendall_tau_distance(
    scores_a: Sequence[float], scores_b: Sequence[float]
) -> float:
    """Number of discordant pairs between two scorings of the same items
    (ties in either scoring are not counted as discordant)."""
    if len(scores_a) != len(scores_b):
        raise ValueError("scorings must cover the same items")
    n = len(scores_a)
    d = 0
    for i in range(n):
        for j in range(i + 1, n):
            x = scores_a[i] - scores_a[j]
            y = scores_b[i] - scores_b[j]
            if x * y < 0:
                d += 1
    return float(d)


def top_k_recall(
    produced: Sequence[object], truth: Sequence[object], k: int
) -> float:
    """Fraction of the true top-k found in the produced top-k (Fig. 10g)."""
    if k == 0:
        return 1.0
    t = set(list(truth)[:k])
    p = set(list(produced)[:k])
    return len(t & p) / min(k, len(t)) if t else 1.0
