"""Join graphs (Def. 3) and their enumeration (Algorithm 2, §4).

A join graph Ω is an undirected multigraph with exactly one node labeled PT
(the provenance table of the user's query) and other nodes labeled with
relations; edges carry join conditions drawn from the schema graph. Nodes
are integers (PT is node 0); each edge records the *base relation* bound to
each endpoint — for the PT node this is the accessed relation whose
``prov_<rel>_<attr>`` columns the condition touches.

``enumerate_join_graphs`` grows graphs one edge at a time exactly as
EnumerateJoinGraphs/ExtendJG/AddEdge in the paper, deduplicating isomorphic
graphs via a small brute-force canonical form (graphs have ≤ λ_#edges ≤ 3
edges, so trying all label-preserving node permutations is cheap).

``is_valid`` implements the paper's two pruning tests: PK-connectivity
(every non-PT node must join on all of its relation's PK attributes) and an
estimated-cost cap. The paper asks PostgreSQL for the cost estimate; we use
the textbook |R⋈S| = |R||S|/max(d_R, d_S) estimate over cached distinct
counts, which serves the same pruning role (DESIGN.md substitution #3).
"""
from __future__ import annotations

import itertools
from dataclasses import dataclass, field

from repro.substrate.catalog import Database
from repro.substrate.query import AggQuery
from repro.core.schema_graph import JoinCond, SchemaGraph

PT_NODE = 0


@dataclass(frozen=True)
class JGEdge:
    """Edge between nodes n1, n2; ``cond`` oriented n1→n2; rel1/rel2 are the
    base relations the two condition sides refer to."""

    n1: int
    n2: int
    cond: JoinCond
    rel1: str
    rel2: str

    def normalized(self) -> "JGEdge":
        if self.n1 <= self.n2:
            return self
        return JGEdge(self.n2, self.n1, self.cond.flipped(), self.rel2, self.rel1)


@dataclass(frozen=True)
class JoinGraph:
    """Ω = (V_J, E_J, l_Jnode, l_Jedge); node 0 is PT (label ``None``)."""

    nodes: tuple[tuple[int, str | None], ...]  # (node id, relation | None=PT)
    edges: tuple[JGEdge, ...]

    @property
    def node_labels(self) -> dict[int, str | None]:
        return dict(self.nodes)

    @property
    def n_edges(self) -> int:
        return len(self.edges)

    def context_nodes(self) -> list[tuple[int, str]]:
        return [(n, r) for n, r in self.nodes if r is not None]

    def incident(self, nid: int) -> list[JGEdge]:
        return [e for e in self.edges if nid in (e.n1, e.n2)]

    def signature(self) -> tuple:
        """Canonical form under label-preserving node renumbering, so the
        breadth-first enumeration can discard isomorphic duplicates."""
        labels = self.node_labels
        ids = sorted(labels)
        best: tuple | None = None
        # PT (node 0) must map to itself; permute only context nodes that
        # share a label.
        ctx = [n for n in ids if n != PT_NODE]
        for perm in itertools.permutations(ctx):
            mapping = {PT_NODE: PT_NODE}
            ok = True
            for old, new in zip(ctx, perm):
                if labels[old] != labels[new]:
                    ok = False
                    break
                mapping[old] = new
            if not ok:
                continue
            eds = []
            for e in self.edges:
                m = JGEdge(
                    mapping[e.n1], mapping[e.n2], e.cond, e.rel1, e.rel2
                ).normalized()
                eds.append((m.n1, m.n2, m.cond, m.rel1, m.rel2))
            cand = (
                tuple(sorted(labels[n] or "" for n in ids)),
                tuple(sorted(eds, key=repr)),
            )
            if best is None or repr(cand) < repr(best):
                best = cand
        assert best is not None
        return best

    def describe(self) -> str:
        parts = [
            f"A_{n + 1}: {r or 'PT'}" for n, r in sorted(self.nodes)
        ]
        eparts = [
            e.cond.describe(f"A_{e.n1 + 1}", f"A_{e.n2 + 1}") for e in self.edges
        ]
        return "; ".join(parts) + (" | " + " ; ".join(eparts) if eparts else "")

    def structure(self) -> str:
        """Compact ``PT - rel - rel`` chain description (as in Fig. 10a)."""
        labels = self.node_labels
        if not self.edges:
            return "PT"
        names = ["PT"] + [r for n, r in sorted(self.nodes) if r is not None]
        return " - ".join(names)


def empty_join_graph() -> JoinGraph:
    """Ω_0: the single PT node (its APT is the provenance table itself)."""
    return JoinGraph(nodes=((PT_NODE, None),), edges=())


def _add_edge(
    jg: JoinGraph, v: int, v_rel: str, end: str, cond: JoinCond
) -> list[JoinGraph]:
    """AddEdge from Algorithm 2: connect node ``v`` (whose condition side is
    bound to base relation ``v_rel``) to relation ``end`` — once via a fresh
    node, and once per existing ``end``-labeled node lacking this edge."""
    out: list[JoinGraph] = []
    new_id = max(n for n, _ in jg.nodes) + 1
    out.append(
        JoinGraph(
            nodes=jg.nodes + ((new_id, end),),
            edges=jg.edges + (JGEdge(v, new_id, cond, v_rel, end),),
        )
    )
    for n, r in jg.nodes:
        if r != end or n == v:
            continue
        dup = any(
            {e.n1, e.n2} == {v, n} and e.normalized().cond
            == JGEdge(v, n, cond, v_rel, end).normalized().cond
            for e in jg.edges
        )
        if not dup:
            out.append(
                JoinGraph(
                    nodes=jg.nodes,
                    edges=jg.edges + (JGEdge(v, n, cond, v_rel, end),),
                )
            )
    return out


def extend_jg(jg: JoinGraph, sg: SchemaGraph, query: AggQuery) -> list[JoinGraph]:
    """ExtendJG from Algorithm 2: all one-edge extensions of ``jg``."""
    out: list[JoinGraph] = []
    for v, label in jg.nodes:
        rels = list(query.relations) if label is None else [label]
        for r in rels:
            for edge, r_is_left in sg.adjacent(r):
                other = edge.r2 if r_is_left else edge.r1
                for cond in edge.conds:
                    oriented = cond if r_is_left else cond.flipped()
                    out.extend(_add_edge(jg, v, r, other, oriented))
    return out


def estimate_apt_rows(jg: JoinGraph, db: Database, pt_rows: int) -> float:
    """System-R style cardinality estimate of |APT(Q, D, Ω)|.

    |result| = |PT| · Π|R_i| · Π_edges 1/max(d_left, d_right), with per-side
    distinct counts of the join attrs taken from the bound base relation
    (the PT side approximated by its accessed relation's statistics).
    """
    est = float(pt_rows)
    for _, rel in jg.context_nodes():
        est *= db.n_rows(rel)
    for e in jg.edges:
        la = e.cond.left_attrs()
        ra = e.cond.right_attrs()
        d_l = db.n_distinct(e.rel1, la) if la else 1
        d_r = db.n_distinct(e.rel2, ra) if ra else 1
        est /= max(d_l, d_r, 1)
    return est


def is_valid(
    jg: JoinGraph, db: Database, pt_rows: int, q_cost: float
) -> bool:
    """isValid from Algorithm 2: PK-connectivity + estimated-cost cap."""
    for nid, rel in jg.context_nodes():
        joined_attrs: set[str] = set()
        for e in jg.incident(nid):
            if e.n1 == nid:
                joined_attrs.update(e.cond.left_attrs())
            if e.n2 == nid:
                joined_attrs.update(e.cond.right_attrs())
        if not set(db.pk(rel)).issubset(joined_attrs):
            return False
    return estimate_apt_rows(jg, db, pt_rows) <= q_cost


def enumerate_join_graphs(
    sg: SchemaGraph, query: AggQuery, n_edges: int
) -> list[JoinGraph]:
    """EnumerateJoinGraphs: breadth-first growth up to λ_#edges edges,
    deduplicated by canonical signature. Includes Ω_0 (pure provenance)."""
    base = empty_join_graph()
    result = [base]
    seen = {base.signature()}
    prev = [base]
    for _ in range(n_edges):
        new: list[JoinGraph] = []
        for jg in prev:
            for ext in extend_jg(jg, sg, query):
                sig = ext.signature()
                if sig not in seen:
                    seen.add(sig)
                    new.append(ext)
        result.extend(new)
        prev = new
    return result
