"""Diversity-aware top-k pattern selection (§3.5).

Patterns are picked greedily by ``wscore(Φ) = Fscore + min_{Φ'∈R} D(Φ, Φ')``
where R is the already-selected set and D averages a per-attribute
matchscore: +1 when Φ' does not constrain the attribute, −0.3 when both
constrain it with different constants, −2 with the same constant. The first
pick is always the highest-F-score pattern.
"""
from __future__ import annotations

from typing import Callable, Sequence, TypeVar

from repro.core.pattern import Pattern

T = TypeVar("T")


def matchscore(phi: Pattern, other: Pattern, attr: str) -> float:
    p = phi.pred_on(attr)
    q = other.pred_on(attr)
    assert p is not None
    if q is None:
        return 1.0
    if (p.value, p.op) == (q.value, q.op):
        return -2.0
    return -0.3


def diversity(phi: Pattern, other: Pattern) -> float:
    """D(Φ, Φ') ∈ [−2, 1]; larger means more dissimilar."""
    if phi.size == 0:
        return 1.0
    total = sum(matchscore(phi, other, a) for a in phi.attrs)
    return total / phi.size


def diverse_topk(
    candidates: Sequence[T],
    k: int,
    pattern_of: Callable[[T], Pattern],
    fscore_of: Callable[[T], float],
) -> list[T]:
    """Greedy wscore selection over arbitrary carriers (explanations)."""
    remaining = sorted(candidates, key=fscore_of, reverse=True)
    if not remaining:
        return []
    selected = [remaining.pop(0)]
    while remaining and len(selected) < k:
        best_i, best_score = 0, float("-inf")
        for i, cand in enumerate(remaining):
            d = min(
                diversity(pattern_of(cand), pattern_of(s)) for s in selected
            )
            score = fscore_of(cand) + d
            if score > best_score:
                best_i, best_score = i, score
        selected.append(remaining.pop(best_i))
    return selected
