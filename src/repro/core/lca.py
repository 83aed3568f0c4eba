"""LCA pattern-candidate generation over categorical attributes (§3.2, [19]).

The LCA (lowest common ancestor) heuristic generates a candidate pattern for
every pair of sample tuples: keep ``attr = c`` where both agree, ``*`` where
they differ. Frequently co-occurring constant combinations therefore surface
as frequently generated patterns.

We first collapse the sample to its distinct categorical-value combinations
(with multiplicities) — the pair (t, t') only depends on the combination
values, so this computes the same candidate multiset in O(d²) instead of
O(n²) for d distinct combos. Candidates are ranked by their weighted pair
frequency; the empty pattern (all *) is discarded.
"""
from __future__ import annotations

import pandas as pd

from repro.core.pattern import Pattern, Predicate

_MAX_COMBOS = 300  # cap d so the pair loop stays bounded


def lca_candidates(
    sample_pdf: pd.DataFrame,
    cat_attrs: list[str],
    max_patterns: int | None = None,
) -> list[Pattern]:
    """Candidate patterns over ``cat_attrs``, most frequent first."""
    if not cat_attrs or sample_pdf.empty:
        return []
    combos = (
        sample_pdf.groupby(cat_attrs, dropna=False, observed=True)
        .size()
        .reset_index(name="__w")
        .sort_values("__w", ascending=False)
        .head(_MAX_COMBOS)
        .reset_index(drop=True)
    )
    vals = combos[cat_attrs].to_numpy(dtype=object)
    w = combos["__w"].to_numpy()
    freq: dict[Pattern, float] = {}
    d = len(combos)
    for i in range(d):
        for j in range(i, d):
            agree = [
                (a, vals[i][k])
                for k, a in enumerate(cat_attrs)
                if vals[i][k] == vals[j][k] and not pd.isna(vals[i][k])
            ]
            if not agree:
                continue
            pat = Pattern(
                tuple(
                    Predicate(a, "=", v)
                    for a, v in sorted(agree, key=lambda t: t[0])
                )
            )
            # pair weight: w_i*w_j for i<j, C(w_i, 2) for the diagonal
            pw = w[i] * w[j] if i != j else w[i] * (w[i] - 1) / 2
            if pw > 0:
                freq[pat] = freq.get(pat, 0.0) + pw
    ranked = sorted(freq.items(), key=lambda kv: -kv[1])
    pats = [p for p, _ in ranked]
    return pats[:max_patterns] if max_patterns else pats
