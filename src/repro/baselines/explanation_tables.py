"""Explanation Tables baseline (Gebaly et al., VLDB 2015 [19]) — "ET".

Given a relation with categorical attributes and a binary outcome, ET
builds a small set of patterns that is optimally *informative* about the
outcome: it greedily adds the pattern with the highest estimated
information gain w.r.t. a maximum-entropy distribution consistent with the
patterns picked so far. We implement the sample-based "Flashlight"
strategy the paper compares against:

  * candidate patterns come from the LCA of a size-``sample_size`` sample
    (cross product of the sample with itself — quadratic in sample size,
    which is the scaling behaviour Fig. 11 shows);
  * the gain of a candidate is the KL divergence between the observed
    outcome rate inside its extension and the current model's prediction,
    weighted by the extension size;
  * after each pick the model estimates are updated (iterative
    proportional fitting limited to a few rounds — sufficient at this
    scale).

Numeric attributes must be discretised by the caller (the paper's §A.1
does the same preprocessing).
"""
from __future__ import annotations

import math
import time
from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.core.pattern import Pattern, Predicate


def _lca_pairs(sample: pd.DataFrame, attrs: list[str]) -> list[Pattern]:
    """All LCA patterns of the sample (including the all-* root)."""
    vals = sample[attrs].to_numpy(dtype=object)
    out: set[Pattern] = {Pattern()}
    n = len(sample)
    for i in range(n):
        for j in range(i + 1, n):
            preds = tuple(
                Predicate(a, "=", vals[i][k])
                for k, a in enumerate(attrs)
                if vals[i][k] == vals[j][k] and not pd.isna(vals[i][k])
            )
            out.add(Pattern(tuple(sorted(preds, key=lambda p: p.attr))))
    return list(out)


@dataclass
class ETResult:
    patterns: list[Pattern]
    runtime_s: float
    n_candidates: int


def explanation_table(
    pdf: pd.DataFrame,
    outcome: str,
    attrs: list[str],
    k: int = 20,
    sample_size: int = 64,
    seed: int = 0,
) -> ETResult:
    """Greedy information-gain summary of ``outcome`` over ``attrs``."""
    t0 = time.perf_counter()
    rng = np.random.default_rng(seed)
    y = pdf[outcome].to_numpy(dtype=float)
    n = len(pdf)
    idx = rng.choice(n, size=min(sample_size, n), replace=False)
    cands = _lca_pairs(pdf.iloc[idx], attrs)

    # Current model estimate of P(outcome=1 | row); start from the prior.
    est = np.full(n, y.mean() if n else 0.0)
    masks = {p: p.pandas_mask(pdf) for p in cands}
    chosen: list[Pattern] = []
    eps = 1e-9
    for _ in range(k):
        best, best_gain = None, -1.0
        for p in cands:
            if p in chosen:
                continue
            m = masks[p]
            cnt = int(m.sum())
            if cnt == 0:
                continue
            obs = float(y[m].mean())
            model = float(est[m].mean())
            kl = obs * math.log((obs + eps) / (model + eps)) + (
                1 - obs
            ) * math.log((1 - obs + eps) / (1 - model + eps))
            gain = cnt * kl
            if gain > best_gain:
                best, best_gain = p, gain
        if best is None or best_gain <= eps:
            break
        chosen.append(best)
        # Cheap IPF: rescale estimates inside each chosen pattern to match
        # its observed rate, a few rounds for consistency.
        for _ in range(3):
            for p in chosen:
                m = masks[p]
                model = float(est[m].mean())
                obs = float(y[m].mean())
                if model > eps:
                    est[m] = np.clip(est[m] * (obs + eps) / (model + eps), 0, 1)
    return ETResult(
        patterns=chosen,
        runtime_s=time.perf_counter() - t0,
        n_candidates=len(cands),
    )


def discretize(pdf: pd.DataFrame, attrs: list[str], n_bins: int = 4) -> pd.DataFrame:
    """Bucket numeric columns into quantile ranges rendered as strings
    (the "[0, 0]" style intervals of the paper's Table 10)."""
    out = pdf.copy()
    for a in attrs:
        s = pd.to_numeric(out[a], errors="coerce")
        try:
            binned = pd.qcut(s, q=n_bins, duplicates="drop")
        except ValueError:
            continue
        out[a] = binned.astype(str)
    return out
