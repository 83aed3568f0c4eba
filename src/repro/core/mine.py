"""MineAPT (Algorithm 1): top-k pattern mining for one join graph.

Phases, each timed under the step names the paper's runtime-breakdown
tables use (Fig. 7/7a/9c/9d):

  Materialize APTs   — build + cache + count the APT for Ω.
  Feature Selection  — draw the mining sample, cluster + RF-filter attrs.
  Gen. Pat. Cand.    — LCA candidates over categorical attributes.
  Sampling for F1    — set up the deterministic PT-tuple sample and its
                       per-side sizes (denominators of recall).
  F-score Calc.      — batched Spark evaluation of pattern supports.
  Refine Patterns    — numeric-predicate refinement rounds (Prop. 3.1
                       recall pruning; refinement evaluation cost is billed
                       here).

Returns the diversity-ranked top-k explanations for both orientations of
the user question plus the per-step timings and APT stats.
"""
from __future__ import annotations

import time
from contextlib import contextmanager
from dataclasses import dataclass, field

import numpy as np

from repro.substrate.catalog import Database
from repro.substrate.provenance import ProvenanceTable
from repro.core.apt import APT, materialize_apt
from repro.core.config import CajadeParams
from repro.core.feature_selection import filter_attrs
from repro.core.join_graph import JoinGraph
from repro.core.lca import lca_candidates
from repro.core.metrics import Support, compute_support
from repro.core.pattern import Pattern
from repro.core.refine import numeric_fragments, refinements
from repro.core.topk import diverse_topk

STEP_NAMES = (
    "Feature Selection",
    "Gen. Pat. Cand.",
    "F-score Calc.",
    "Materialize APTs",
    "Refine Patterns",
    "Sampling for F1",
    "JG Enum.",
)

_BEAM = 60  # refinements carried to the next round (tractability cap)
_MAX_DRIVER_ROWS = 3_000_000  # above this, score via the distributed path


class StepTimer:
    """Accumulates wall-clock seconds per named pipeline step."""

    def __init__(self) -> None:
        self.times: dict[str, float] = {}

    @contextmanager
    def step(self, name: str):
        t0 = time.perf_counter()
        try:
            yield
        finally:
            self.times[name] = self.times.get(name, 0.0) + (
                time.perf_counter() - t0
            )

    def merge(self, other: "StepTimer") -> None:
        for k, v in other.times.items():
            self.times[k] = self.times.get(k, 0.0) + v

    @property
    def total(self) -> float:
        return sum(self.times.values())


@dataclass(frozen=True)
class Explanation:
    """(Ω, Φ, (v1, a1), (v2, a2)) with the chosen primary tuple (Def. 6)."""

    jg: JoinGraph
    pattern: Pattern
    primary: int  # 1 → t1 is primary, 2 → t2
    support: Support

    @property
    def fscore(self) -> float:
        return self.support.fscore(self.primary)

    @property
    def precision(self) -> float:
        return self.support.precision(self.primary)

    @property
    def recall(self) -> float:
        return self.support.recall(self.primary)

    def describe(self) -> str:
        return f"{self.pattern.describe()} [t{self.primary}]"


@dataclass
class MineResult:
    explanations: list[Explanation]
    timer: StepTimer
    apt_rows: int = 0
    n_pattern_attrs: int = 0
    n_candidates: int = 0


def _sided_sample(apt: APT, t1, t2, rate: float, cap: int, seed: int):
    """Pandas mining sample restricted to the two sides + its binary label."""
    from pyspark.sql import functions as F

    df = apt.df
    cond1 = F.lit(True)
    for k in apt.group_cols:
        cond1 = cond1 & (F.col(k) == F.lit(t1[k]))
    if t2 is not None:
        cond2 = F.lit(True)
        for k in apt.group_cols:
            cond2 = cond2 & (F.col(k) == F.lit(t2[k]))
    else:
        cond2 = ~cond1
    df = df.withColumn(
        "__side", F.when(cond1, 1).when(cond2, 2)
    ).filter(F.col("__side").isNotNull())
    full = df
    if rate < 1.0:
        df = df.sample(fraction=min(1.0, rate * 1.3), seed=seed)
    pdf = df.limit(cap).toPandas()
    if len(pdf) < 20:
        # Tiny APT: the rate sample is too small to mine from — fall back
        # to the first ``cap`` rows (still bounded).
        pdf = full.limit(cap).toPandas()
    label = (pdf["__side"] == 1).to_numpy(dtype=int)
    return pdf.drop(columns=["__side"]), label


def mine_apt(
    db: Database,
    pt: ProvenanceTable,
    jg: JoinGraph,
    t1: dict[str, object],
    t2: dict[str, object] | None,
    params: CajadeParams,
) -> MineResult:
    timer = StepTimer()

    with timer.step("Materialize APTs"):
        apt = materialize_apt(db, pt, jg)
        apt.df = apt.df.cache()
        apt_rows = apt.df.count()
    if apt_rows == 0:
        apt.df.unpersist()
        return MineResult([], timer, apt_rows=0)

    # With feature selection disabled ("Naive", §5.1) the mining sample is
    # still needed for LCA, so its cost is billed to candidate generation
    # and the breakdown tables report Feature Selection as N/A.
    fs_step = (
        "Feature Selection" if params.feature_selection else "Gen. Pat. Cand."
    )
    with timer.step(fs_step):
        sample_pdf, label = _sided_sample(
            apt, t1, t2, params.pat_samp, params.pat_samp_cap, params.seed
        )
        usable = list(apt.pattern_cols)
        exclude = tuple(
            c for c in sample_pdf.columns if c not in usable
        )
        fr = filter_attrs(
            sample_pdf,
            label,
            params.n_sel_attr,
            exclude=exclude,
            enabled=params.feature_selection,
            seed=params.seed,
        )

    with timer.step("Gen. Pat. Cand."):
        cands = lca_candidates(sample_pdf, fr.cat_attrs, max_patterns=200)

    from repro.core.metrics import SupportEvaluator, pt_sizes

    pattern_attrs = list(dict.fromkeys(fr.num_attrs + fr.cat_attrs))
    evaluator: SupportEvaluator | None = None
    with timer.step("Sampling for F1"):
        f1_samp = params.f1_samp if params.f1_samp < 1.0 else None
        est_rows = apt_rows * (f1_samp or 1.0)
        if est_rows <= _MAX_DRIVER_ROWS:
            evaluator = SupportEvaluator(
                apt, pt, pattern_attrs, t1, t2, f1_samp, params.seed
            )
            n1, n2 = evaluator.n1, evaluator.n2
        else:
            n1, n2 = pt_sizes(pt, t1, t2, f1_samp, params.seed)
    if (n1 == 0 or n2 == 0) and f1_samp is not None:
        # The F-score sample missed one side entirely; fall back to exact.
        f1_samp = None
        with timer.step("Sampling for F1"):
            if evaluator is not None:
                evaluator = SupportEvaluator(
                    apt, pt, pattern_attrs, t1, t2, None, params.seed
                )

    def score(pats: list[Pattern]) -> list[Support]:
        if evaluator is not None:
            return evaluator.supports(pats)
        return compute_support(apt, pt, pats, t1, t2, f1_samp, params.seed)

    with timer.step("F-score Calc."):
        supports = score(cands)
    scored: dict[Pattern, Support] = dict(zip(cands, supports))
    keep = [
        p
        for p in cands
        if max(scored[p].recall(1), scored[p].recall(2))
        >= params.recall_threshold
    ]
    keep.sort(
        key=lambda p: -max(scored[p].recall(1), scored[p].recall(2))
    )
    frontier = keep[: params.k_cat]
    if not frontier and cands:
        # Even the best categorical pattern missed λ_recall — refine the
        # top-frequency candidates anyway (plus the empty pattern) so purely
        # numeric explanations can still emerge.
        frontier = cands[: params.k_cat]
    frontier = frontier + [Pattern()]

    with timer.step("Refine Patterns"):
        frags = numeric_fragments(sample_pdf, fr.num_attrs, params.n_frag)
        done: set[Pattern] = set(scored)
        level = frontier
        for _ in range(params.attr_num):
            todo: list[Pattern] = []
            for p in level:
                for r in refinements(p, frags, params.attr_num):
                    if r not in done:
                        done.add(r)
                        todo.append(r)
            if not todo:
                break
            sups = score(todo)
            for p, s in zip(todo, sups):
                scored[p] = s
            # Prop. 3.1: refinements of low-recall patterns stay low-recall.
            survivors = [
                p
                for p in todo
                if max(scored[p].recall(1), scored[p].recall(2))
                >= params.recall_threshold
            ]
            survivors.sort(
                key=lambda p: -max(scored[p].fscore(1), scored[p].fscore(2))
            )
            level = survivors[:_BEAM]

    candidates: list[Explanation] = []
    for p, s in scored.items():
        if p.size == 0:
            continue
        for primary in (1, 2):
            if s.recall(primary) >= params.recall_threshold:
                candidates.append(Explanation(jg, p, primary, s))
    top = diverse_topk(
        candidates,
        params.k,
        pattern_of=lambda e: e.pattern,
        fscore_of=lambda e: e.fscore,
    )
    apt.df.unpersist()
    return MineResult(
        top,
        timer,
        apt_rows=apt_rows,
        n_pattern_attrs=len(apt.pattern_cols),
        n_candidates=len(scored),
    )
