"""CAPE baseline (Miao et al., SIGMOD 2019 [34]) — pattern-based
counterbalances, reduced to the behaviour §5.6/Fig. 13 exercises.

CAPE takes one answer tuple plus a direction (high/low), fits a trend over
the query's answer relation (we use least-squares regression of the
aggregate value over the ordinal group position, as the paper describes:
"identifies a trend in the data (using regression) according to which the
user question is an outlier in the user-provided direction"), and returns
the top-k *counterbalancing* tuples — similar outliers in the opposite
direction, ranked by residual magnitude.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd


@dataclass
class CapeExplanation:
    group: dict
    value: float
    residual: float


def counterbalances(
    result_pdf: pd.DataFrame,
    group_col: str,
    value_col: str,
    question_group: object,
    direction: str,
    k: int = 3,
) -> list[CapeExplanation]:
    """Top-k counterbalances for "why is ``question_group``'s value
    ``direction`` (high/low)?" over a single-group-by answer relation."""
    if direction not in ("high", "low"):
        raise ValueError("direction must be 'high' or 'low'")
    pdf = result_pdf.sort_values(group_col).reset_index(drop=True)
    x = np.arange(len(pdf), dtype=float)
    y = pdf[value_col].to_numpy(dtype=float)
    if len(pdf) >= 2:
        slope, intercept = np.polyfit(x, y, 1)
    else:
        slope, intercept = 0.0, float(y.mean()) if len(y) else 0.0
    resid = y - (slope * x + intercept)
    # Counterbalances go the *other* way from the user's direction.
    want_low = direction == "high"
    mask = resid < 0 if want_low else resid > 0
    mask &= (pdf[group_col] != question_group).to_numpy()
    order = np.argsort(resid if want_low else -resid)
    out: list[CapeExplanation] = []
    for i in order:
        if not mask[i]:
            continue
        out.append(
            CapeExplanation(
                group={group_col: pdf[group_col].iloc[i]},
                value=float(y[i]),
                residual=float(resid[i]),
            )
        )
        if len(out) >= k:
            break
    return out
