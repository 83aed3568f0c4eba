"""Schema graph (Def. 2): which equi-joins are permissible in a schema.

Nodes are relations; each undirected edge carries a *set* of join
conditions, each condition a conjunction of attribute-equality pairs
(optionally attr = constant). Conditions are stored *oriented* left→right
relative to the edge's (r1, r2) endpoints; the join-graph layer flips them
as needed when it walks an edge from either side.

Schema graphs are built from foreign keys (``from_foreign_keys``) and can be
extended with user-supplied conditions, mirroring the paper's setup.
"""
from __future__ import annotations

from dataclasses import dataclass, field


@dataclass(frozen=True)
class JoinCond:
    """One join condition: conjunction of (left_attr, right_attr) equalities
    between the edge endpoints, plus optional constant constraints
    ((side, attr, value) with side in {"l", "r"})."""

    pairs: tuple[tuple[str, str], ...]
    consts: tuple[tuple[str, str, object], ...] = ()

    def flipped(self) -> "JoinCond":
        return JoinCond(
            pairs=tuple((r, l) for l, r in self.pairs),
            consts=tuple(
                ("r" if s == "l" else "l", a, v) for s, a, v in self.consts
            ),
        )

    def left_attrs(self) -> tuple[str, ...]:
        return tuple(l for l, _ in self.pairs) + tuple(
            a for s, a, _ in self.consts if s == "l"
        )

    def right_attrs(self) -> tuple[str, ...]:
        return tuple(r for _, r in self.pairs) + tuple(
            a for s, a, _ in self.consts if s == "r"
        )

    def describe(self, l: str, r: str) -> str:
        parts = [f"({l}.{a})=({r}.{b})" for a, b in self.pairs]
        parts += [
            f"({(l if s == 'l' else r)}.{a})={v!r}" for s, a, v in self.consts
        ]
        return " AND ".join(parts)


@dataclass(frozen=True)
class SchemaEdge:
    """Undirected edge between relations r1, r2 with its condition set."""

    r1: str
    r2: str
    conds: tuple[JoinCond, ...]


@dataclass
class SchemaGraph:
    """``G = (V_S, E_S, l_Sedge)`` for a database schema."""

    relations: tuple[str, ...]
    edges: list[SchemaEdge] = field(default_factory=list)

    def add_edge(self, r1: str, r2: str, *conds: JoinCond) -> None:
        if r1 not in self.relations or r2 not in self.relations:
            raise ValueError(f"unknown relation in edge ({r1}, {r2})")
        if not conds:
            raise ValueError("an edge needs at least one join condition")
        self.edges.append(SchemaEdge(r1, r2, tuple(conds)))

    def adjacent(self, rel: str) -> list[tuple[SchemaEdge, bool]]:
        """Edges incident to ``rel``; the bool says whether ``rel`` is the
        edge's *left* endpoint (self-loops are reported once, as left)."""
        out: list[tuple[SchemaEdge, bool]] = []
        for e in self.edges:
            if e.r1 == rel:
                out.append((e, True))
            elif e.r2 == rel:
                out.append((e, False))
        return out


def fk_cond(*attr_pairs: tuple[str, str]) -> JoinCond:
    """Shorthand for a plain equi-join condition."""
    return JoinCond(pairs=tuple(attr_pairs))
