"""Augmented provenance tables (Def. 4): PT joined with context relations.

``materialize_apt`` walks a join graph breadth-first from the PT node and
realises it as a chain of Catalyst equi-joins:

  * each context node's relation is loaded with columns renamed to a unique
    prefix (``team_``, ``player_salary_``, ``lineup_player2_`` …, matching
    the paper's alias disambiguation);
  * an edge whose far endpoint is not yet part of the plan becomes a join;
    an edge between two already-joined nodes (a cycle / parallel edge)
    becomes a filter;
  * constant constraints inside join conditions become filters;
  * after all joins, the context-side join-key columns are dropped — they
    duplicate the columns they were equated with ("duplicate (renamed)
    columns are removed", Def. 4).

The result keeps PT's ``prov_*`` columns, the group-by output columns and
``__pt_id`` (so Def. 7's per-provenance-tuple coverage can group back),
plus the surviving context columns.
"""
from __future__ import annotations

from collections import deque
from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.substrate.catalog import Database
from repro.substrate.provenance import ProvenanceTable, prov_col
from repro.core.join_graph import PT_NODE, JoinGraph


@dataclass
class APT:
    """A materialised augmented provenance table plus its bookkeeping."""

    jg: JoinGraph
    df: DataFrame
    group_cols: tuple[str, ...]
    prov_cols: tuple[str, ...]      # PT-side attribute columns
    context_cols: tuple[str, ...]   # surviving context attribute columns
    group_prov_cols: tuple[str, ...] = ()  # prov_* twins of group-by attrs
    group_attr_names: tuple[str, ...] = ()  # base attr names used in grouping
    col_attr: dict[str, str] = None  # context col → base attribute name

    @property
    def pattern_cols(self) -> tuple[str, ...]:
        """Columns patterns may use. §2.4 bans attributes used in grouping —
        including context-node copies of them (a joined ``season`` node's
        ``season_name`` would trivially determine the answer tuples) — plus
        their prov_* twins and ``__pt_id``."""
        banned = set(self.group_cols) | set(self.group_prov_cols)
        ctx = {}
        if self.col_attr:
            ctx = self.col_attr
        banned |= {
            c
            for c, attr in ctx.items()
            if attr in set(self.group_attr_names)
        }
        return tuple(
            c for c in self.prov_cols + self.context_cols if c not in banned
        )


def _node_prefixes(jg: JoinGraph) -> dict[int, str]:
    """Context node id → column prefix; repeated relations get suffixes
    2, 3, … (LineupPlayer, LineupPlayer2 — the paper's renaming rule)."""
    counts: dict[str, int] = {}
    prefixes: dict[int, str] = {}
    for nid, rel in sorted(jg.nodes):
        if rel is None:
            continue
        counts[rel] = counts.get(rel, 0) + 1
        prefixes[nid] = rel if counts[rel] == 1 else f"{rel}{counts[rel]}"
    return prefixes


def _side_col(
    nid: int, rel: str, attr: str, prefixes: dict[int, str]
) -> str:
    if nid == PT_NODE:
        return prov_col(rel, attr)
    return f"{prefixes[nid]}_{attr}"


def materialize_apt(db: Database, pt: ProvenanceTable, jg: JoinGraph) -> APT:
    """Build ``APT(Q, D, Ω)`` as a DataFrame (lazy; caller decides caching)."""
    prefixes = _node_prefixes(jg)
    df = pt.df
    joined = {PT_NODE}
    context_cols: list[str] = []
    col_attr: dict[str, str] = {}
    dropped: list[str] = []
    edges = deque(jg.edges)
    stall = 0
    while edges:
        e = edges.popleft()
        new_side = None
        if e.n1 not in joined and e.n2 in joined:
            new_side = "l"
        elif e.n2 not in joined and e.n1 in joined:
            new_side = "r"
        elif e.n1 in joined and e.n2 in joined:
            stall = 0
        else:
            # Neither endpoint reached yet: requeue (the enumeration only
            # emits connected graphs, so progress is guaranteed).
            edges.append(e)
            stall += 1
            if stall > len(edges):
                raise ValueError(f"join graph is not connected to PT: {jg}")
            continue
        stall = 0
        if new_side is not None:
            new_nid = e.n1 if new_side == "l" else e.n2
            rel = jg.node_labels[new_nid]
            assert rel is not None
            pfx = prefixes[new_nid]
            right = db.df(rel)
            right = right.select(
                *[F.col(a).alias(f"{pfx}_{a}") for a in right.columns]
            )
            context_cols.extend(f"{pfx}_{a}" for a in db.attrs(rel))
            col_attr.update({f"{pfx}_{a}": a for a in db.attrs(rel)})
            cond = None
            for la, ra in e.cond.pairs:
                lcol = _side_col(e.n1, e.rel1, la, prefixes)
                rcol = _side_col(e.n2, e.rel2, ra, prefixes)
                c = F.col(lcol) == F.col(rcol)
                cond = c if cond is None else (cond & c)
                # The new node's join keys equal the other side — drop them.
                dropped.append(lcol if new_side == "l" else rcol)
            for side, attr, value in e.cond.consts:
                nid = e.n1 if side == "l" else e.n2
                rel_ = e.rel1 if side == "l" else e.rel2
                c = F.col(_side_col(nid, rel_, attr, prefixes)) == F.lit(value)
                cond = c if cond is None else (cond & c)
            if cond is None:
                raise ValueError("edge with empty join condition")
            df = df.join(right, on=cond, how="inner")
            joined.add(new_nid)
        else:
            cond = None
            for la, ra in e.cond.pairs:
                lcol = _side_col(e.n1, e.rel1, la, prefixes)
                rcol = _side_col(e.n2, e.rel2, ra, prefixes)
                c = F.col(lcol) == F.col(rcol)
                cond = c if cond is None else (cond & c)
            for side, attr, value in e.cond.consts:
                nid = e.n1 if side == "l" else e.n2
                rel_ = e.rel1 if side == "l" else e.rel2
                c = F.col(_side_col(nid, rel_, attr, prefixes)) == F.lit(value)
                cond = c if cond is None else (cond & c)
            assert cond is not None
            df = df.filter(cond)
    keep_context = [c for c in dict.fromkeys(context_cols) if c not in set(dropped)]
    df = df.drop(*[c for c in set(dropped) if c in df.columns])
    return APT(
        jg=jg,
        df=df,
        group_cols=pt.group_cols,
        prov_cols=pt.prov_cols,
        context_cols=tuple(keep_context),
        group_prov_cols=pt.group_prov_cols,
        group_attr_names=tuple(
            ref.partition(".")[2] for ref, _ in pt.query.group_by
        ),
        col_attr=col_attr,
    )
