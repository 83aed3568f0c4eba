"""Why-provenance for single-block aggregate queries (Perm/GProM substitute).

The paper obtains ``PT(Q, D)`` from the GProM middleware [5]; for the
single-block SPJA queries CaJaDE supports (Def. 1), Perm-style
why-provenance has a closed form: the selection+join result over
``rels_Q(D)`` with *all* base attributes retained, where the provenance of
an output tuple ``t`` is the subset of rows whose group-by values equal
``t``'s. We build exactly that as a Spark DataFrame.

Conventions (matching the paper's appendix output):
  * every base attribute is exported as ``prov_<rel>_<attr>`` (alias-based
    when the query self-joins a relation);
  * the group-by attributes are *also* exported under their output names so
    provenance rows can be linked to answer tuples;
  * a synthetic ``__pt_id`` column identifies each provenance tuple — the
    coverage metrics of Def. 7 count *distinct provenance tuples*, so the
    APT (which fans each PT row out across joined context rows) must be able
    to group back to PT tuples.
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.substrate.catalog import Database
from repro.substrate.query import AggQuery

PT_ID = "__pt_id"
PROV_PREFIX = "prov_"


def prov_col(rel_or_alias: str, attr: str) -> str:
    return f"{PROV_PREFIX}{rel_or_alias}_{attr}"


@dataclass
class ProvenanceTable:
    """``PT(Q, D)`` plus the bookkeeping needed to slice it per answer."""

    query: AggQuery
    df: DataFrame               # prov_* columns + group output columns + __pt_id
    group_cols: tuple[str, ...]  # group-by output names
    prov_cols: tuple[str, ...]   # the prov_* columns
    group_prov_cols: tuple[str, ...]  # prov_* twins of group-by attrs
    n_rows: int

    def for_answer(self, t: dict[str, object]) -> DataFrame:
        """``PT(Q, D, t)`` — rows contributing to answer tuple ``t``."""
        cond = None
        for k, v in t.items():
            c = F.col(k) == F.lit(v)
            cond = c if cond is None else (cond & c)
        return self.df.filter(cond) if cond is not None else self.df

    def size_for_answer(self, t: dict[str, object]) -> int:
        return self.for_answer(t).count()


def _prov_prefixes(query: AggQuery) -> dict[str, str]:
    """alias → name used in the prov_ prefix (relation name when unique,
    else the alias, mirroring the paper's disambiguation rule)."""
    rel_counts: dict[str, int] = {}
    for rel, _ in query.tables:
        rel_counts[rel] = rel_counts.get(rel, 0) + 1
    return {
        alias: (rel if rel_counts[rel] == 1 else alias)
        for rel, alias in query.tables
    }


def compute_pt(db: Database, query: AggQuery) -> ProvenanceTable:
    """Materialise ``PT(Q, D)`` (Def. 1) and freeze its tuple identifiers."""
    db.create_views()
    prefixes = _prov_prefixes(query)
    select_items: list[str] = []
    prov_cols: list[str] = []
    for rel, alias in query.tables:
        for attr in db.attrs(rel):
            out = prov_col(prefixes[alias], attr)
            select_items.append(f"{alias}.{attr} AS {out}")
            prov_cols.append(out)
    # prov_* twins of group-by attributes exactly determine the answer
    # tuples, so patterns must not use them (§2.4 forbids group-by attrs).
    group_prov: list[str] = []
    for ref, out in query.group_by:
        select_items.append(f"{ref} AS {out}")
        alias, _, attr = ref.partition(".")
        group_prov.append(prov_col(prefixes[alias], attr))
    sql = (
        f"SELECT {', '.join(select_items)} "
        f"FROM {query.from_sql()} WHERE {query.where_sql()}"
    )
    df = db.spark.sql(sql)
    # Content-deterministic tuple id: row_number over a total order of all
    # columns. Unlike monotonically_increasing_id, it is stable when the
    # plan is re-executed (cache eviction, AQE re-partitioning), which the
    # coverage metrics rely on — the APT's __pt_id values must agree with
    # PT's under any recomputation. The single-partition window is fine at
    # PT scale (provenance of one query, ≤ a few 100k rows).
    from pyspark.sql import Window

    w = Window.orderBy(*[F.col(c) for c in df.columns])
    df = df.withColumn(PT_ID, F.row_number().over(w))
    df = df.cache()
    n = df.count()
    return ProvenanceTable(
        query=query,
        df=df,
        group_cols=query.group_output_names,
        prov_cols=tuple(prov_cols),
        group_prov_cols=tuple(group_prov),
        n_rows=n,
    )
