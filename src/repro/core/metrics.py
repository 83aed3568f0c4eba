"""Pattern quality metrics (Def. 7): TP/FP/FN, precision, recall, F-score.

Coverage counts *distinct provenance tuples* — a PT tuple is covered when at
least one of its APT rows matches the pattern — so the Spark evaluation is a
two-stage aggregation: per-(``__pt_id``, side) ``max(match_i)`` then a
per-side ``sum``. All patterns of a batch are evaluated in **one** Spark job
(one boolean column per pattern), which is the optimization that makes
"F-score Calc." tractable (§5.1's dominant step).

F-score sampling (λ_F1-samp) samples *PT tuples* (not APT rows) with a
deterministic hash so numerator and denominator stay consistent, and so that
the same sample is drawn across batches.

``brute_force_support`` is a pandas reference implementation used by tests
to validate the distributed path.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd
from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F

from repro.substrate.provenance import PT_ID, ProvenanceTable
from repro.core.apt import APT
from repro.core.pattern import Pattern

_BATCH = 200  # patterns per Spark job; keeps codegen size bounded


@dataclass(frozen=True)
class Support:
    """Relative support (v1, a1), (v2, a2) of a pattern for (t1, t2)."""

    cov1: int  # v1 — covered PT tuples of t1
    n1: int    # a1 — |PT(Q, D, t1)|
    cov2: int  # v2
    n2: int    # a2

    def __post_init__(self) -> None:
        # Coverage counts a subset of each side's provenance — a violation
        # means the APT's __pt_id values desynced from PT's (e.g. an
        # unstable tuple-id under recomputation), which silently corrupts
        # every metric. Fail loudly instead.
        if self.cov1 > self.n1 or self.cov2 > self.n2:
            raise ValueError(
                f"coverage exceeds provenance size: {self} — "
                "PT tuple ids are inconsistent between PT and APT"
            )

    def metrics(self, primary: int) -> tuple[float, float, float]:
        """(precision, recall, fscore) treating t1 (primary=1) or t2
        (primary=2) as the primary tuple of Def. 7."""
        tp, fp, n = (
            (self.cov1, self.cov2, self.n1)
            if primary == 1
            else (self.cov2, self.cov1, self.n2)
        )
        prec = tp / (tp + fp) if tp + fp else 0.0
        rec = tp / n if n else 0.0
        f1 = 2 * prec * rec / (prec + rec) if prec + rec else 0.0
        return prec, rec, f1

    def precision(self, primary: int = 1) -> float:
        return self.metrics(primary)[0]

    def recall(self, primary: int = 1) -> float:
        return self.metrics(primary)[1]

    def fscore(self, primary: int = 1) -> float:
        return self.metrics(primary)[2]


def _group_cond(group_cols: tuple[str, ...], t: dict[str, object]) -> Column:
    cond = F.lit(True)
    for k in group_cols:
        cond = cond & (F.col(k) == F.lit(t[k]))
    return cond


def _sample_pred(rate: float | None, seed: int) -> Column | None:
    if rate is None or rate >= 1.0:
        return None
    return F.pmod(F.xxhash64(F.col(PT_ID), F.lit(seed)), F.lit(10000)) < int(
        rate * 10000
    )


def pt_sizes(
    pt: ProvenanceTable,
    t1: dict[str, object],
    t2: dict[str, object] | None,
    f1_samp: float | None = None,
    seed: int = 0,
) -> tuple[int, int]:
    """(|PT(Q,D,t1)|, |PT(Q,D,t2)|) under the F-score sample. For
    single-point questions (t2 is None) the second side is PT \\ PT(t1)."""
    df = pt.df
    pred = _sample_pred(f1_samp, seed)
    if pred is not None:
        df = df.filter(pred)
    c1 = _group_cond(pt.group_cols, t1)
    agg = df.select(
        F.sum(F.when(c1, 1).otherwise(0)).alias("n1"),
        (
            F.sum(F.when(_group_cond(pt.group_cols, t2), 1).otherwise(0))
            if t2 is not None
            else F.sum(F.when(~c1, 1).otherwise(0))
        ).alias("n2"),
    ).collect()[0]
    return int(agg["n1"] or 0), int(agg["n2"] or 0)


def compute_support(
    apt: APT,
    pt: ProvenanceTable,
    patterns: list[Pattern],
    t1: dict[str, object],
    t2: dict[str, object] | None,
    f1_samp: float | None = None,
    seed: int = 0,
) -> list[Support]:
    """Evaluate the supports of many patterns in few Spark jobs."""
    if not patterns:
        return []
    n1, n2 = pt_sizes(pt, t1, t2, f1_samp, seed)
    df = apt.df
    pred = _sample_pred(f1_samp, seed)
    if pred is not None:
        df = df.filter(pred)
    c1 = _group_cond(apt.group_cols, t1)
    side = F.when(c1, 1)
    if t2 is not None:
        side = side.when(_group_cond(apt.group_cols, t2), 2)
    else:
        side = side.otherwise(2)
    df = df.withColumn("__side", side).filter(F.col("__side").isNotNull())

    out: list[Support] = []
    for lo in range(0, len(patterns), _BATCH):
        chunk = patterns[lo : lo + _BATCH]
        cols = [
            F.when(p.to_column(), 1).otherwise(0).alias(f"__m{i}")
            for i, p in enumerate(chunk)
        ]
        stage1 = (
            df.select(PT_ID, "__side", *cols)
            .groupBy(PT_ID, "__side")
            .agg(*[F.max(f"__m{i}").alias(f"__c{i}") for i in range(len(chunk))])
        )
        rows = (
            stage1.groupBy("__side")
            .agg(*[F.sum(f"__c{i}").alias(f"__c{i}") for i in range(len(chunk))])
            .collect()
        )
        cov = {int(r["__side"]): r for r in rows}
        for i in range(len(chunk)):
            c1v = int(cov[1][f"__c{i}"]) if 1 in cov else 0
            c2v = int(cov[2][f"__c{i}"]) if 2 in cov else 0
            out.append(Support(cov1=c1v, n1=n1, cov2=c2v, n2=n2))
    return out


class SupportEvaluator:
    """Vectorised support evaluation over a collected APT projection.

    One Spark job materialises the F1-sampled APT restricted to the two
    question sides and projected to (``__pt_id``, side, pattern columns);
    every subsequent pattern evaluation is then a numpy pass on the driver.
    This mirrors the paper's design — λ_F1-samp exists precisely to make
    F-score calculation operate on a bounded sample — while keeping the
    data-heavy steps (PT, APT joins, sampling) in Spark. For APTs whose
    sampled projection exceeds ``max_rows``, callers should fall back to
    :func:`compute_support` (the fully distributed path).
    """

    def __init__(
        self,
        apt: APT,
        pt: ProvenanceTable,
        attrs: list[str],
        t1: dict[str, object],
        t2: dict[str, object] | None,
        f1_samp: float | None = None,
        seed: int = 0,
    ) -> None:
        self.n1, self.n2 = pt_sizes(pt, t1, t2, f1_samp, seed)
        df = apt.df
        pred = _sample_pred(f1_samp, seed)
        if pred is not None:
            df = df.filter(pred)
        c1 = _group_cond(apt.group_cols, t1)
        side = F.when(c1, 1)
        if t2 is not None:
            side = side.when(_group_cond(apt.group_cols, t2), 2)
        else:
            side = side.otherwise(2)
        cols = [c for c in dict.fromkeys(attrs) if c in apt.df.columns]
        pdf = (
            df.withColumn("__side", side)
            .filter(F.col("__side").isNotNull())
            .select(PT_ID, "__side", *cols)
            .toPandas()
        )
        self.pdf = pdf
        import numpy as np

        codes, uniques = pd.factorize(pdf[PT_ID])
        self._codes = codes
        self._n_ptids = len(uniques)
        self._side1 = (pdf["__side"] == 1).to_numpy()
        self._side2 = (pdf["__side"] == 2).to_numpy()
        self._np = np

    @property
    def n_rows(self) -> int:
        return len(self.pdf)

    def support(self, pattern: Pattern) -> Support:
        np = self._np
        mask = pattern.pandas_mask(self.pdf)
        cov = np.zeros(self._n_ptids, dtype=bool)
        cov[self._codes[mask & self._side1]] = True
        cov1 = int(cov.sum())
        cov[:] = False
        cov[self._codes[mask & self._side2]] = True
        cov2 = int(cov.sum())
        return Support(cov1=cov1, n1=self.n1, cov2=cov2, n2=self.n2)

    def supports(self, patterns: list[Pattern]) -> list[Support]:
        return [self.support(p) for p in patterns]


def brute_force_support(
    apt_pdf: pd.DataFrame,
    pt_pdf: pd.DataFrame,
    group_cols: tuple[str, ...],
    pattern: Pattern,
    t1: dict[str, object],
    t2: dict[str, object] | None,
) -> Support:
    """Reference implementation of Def. 7 over pandas frames (tests only)."""

    def side_mask(pdf: pd.DataFrame, t: dict[str, object]) -> pd.Series:
        m = pd.Series(True, index=pdf.index)
        for k in group_cols:
            m &= pdf[k] == t[k]
        return m

    m1_pt = side_mask(pt_pdf, t1)
    m2_pt = side_mask(pt_pdf, t2) if t2 is not None else ~m1_pt
    match = pattern.pandas_mask(apt_pdf)
    covered_ids = set(apt_pdf.loc[match, PT_ID])
    m1_apt = side_mask(apt_pdf, t1)
    m2_apt = side_mask(apt_pdf, t2) if t2 is not None else ~m1_apt
    cov1 = len(set(apt_pdf.loc[m1_apt, PT_ID]) & covered_ids)
    cov2 = len(set(apt_pdf.loc[m2_apt, PT_ID]) & covered_ids)
    return Support(
        cov1=cov1, n1=int(m1_pt.sum()), cov2=cov2, n2=int(m2_pt.sum())
    )
