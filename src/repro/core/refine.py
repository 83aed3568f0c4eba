"""Pattern refinement with numeric predicates (§3.4).

Numeric domains are split into λ_#frag fragments; only fragment boundaries
(quantiles of the mining sample) become thresholds, with ops ≤ and ≥.
``refinements`` enumerates the one-predicate extensions of a pattern,
respecting λ_attrNum (max numeric predicates per pattern). By Prop. 3.1 a
refinement's recall can only drop, so the miner prunes any pattern (and all
of its refinements) whose recall is below λ_recall.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.pattern import Pattern, Predicate


def numeric_fragments(
    sample_pdf: pd.DataFrame, attrs: list[str], n_frag: int
) -> dict[str, list[float]]:
    """attr → fragment-boundary thresholds (interior quantiles; min/max are
    excluded because ``x ≥ min`` / ``x ≤ max`` match everything)."""
    out: dict[str, list[float]] = {}
    qs = np.linspace(0, 1, n_frag + 1)[1:-1]
    for a in attrs:
        s = pd.to_numeric(sample_pdf[a], errors="coerce").dropna()
        if s.empty:
            out[a] = []
            continue
        vals = sorted({round(float(v), 4) for v in np.quantile(s, qs)})
        out[a] = vals
    return out


def refinements(
    pattern: Pattern,
    fragments: dict[str, list[float]],
    attr_num: int,
) -> list[Pattern]:
    """All one-numeric-predicate refinements of ``pattern``."""
    n_numeric = sum(1 for p in pattern.preds if p.attr in fragments)
    if n_numeric >= attr_num:
        return []
    out: list[Pattern] = []
    for attr, bounds in fragments.items():
        if pattern.pred_on(attr) is not None:
            continue
        for thr in bounds:
            for op in ("<=", ">="):
                out.append(pattern.with_pred(Predicate(attr, op, thr)))
    return out
