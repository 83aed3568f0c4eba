"""Dataset scaling (§5 "Datasets").

The paper creates scaled dataset versions by (a) random sampling that
preserves relative table sizes and join-result sizes, and (b) duplicating
rows with identifier-suffixed keys so constraints hold and join sizes scale.
Both are implemented here over a :class:`Database`:

``scale_down`` samples the *entity* tables (those whose PK is a single
surrogate key is untouched — we sample fact tables uniformly with a
deterministic hash, which preserves join fan-outs in expectation).

``scale_up`` unions ``ceil(factor)`` copies of every table, rewriting every
key-ish column (``*_id`` plus declared PK string columns) with a per-copy
suffix so PKs stay unique and each copy joins only with itself — join
results scale by the same factor.

For generator-backed experiments it is usually preferable to regenerate at
the target ``sf``; these utilities reproduce the paper's mechanism and are
exercised by the scalability benchmark at small factors.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.substrate.catalog import Database


def _key_cols(db: Database, name: str) -> list[str]:
    t = db.tables[name]
    dtypes = dict(t.df.dtypes)
    keys = {c for c in t.attrs if c.endswith("_id")} | set(t.pk)
    return [c for c in keys if dtypes.get(c) == "string"]


def scale_down(db: Database, factor: float, seed: int = 0) -> Database:
    """Deterministically sample entities to ~``factor`` survival.

    Every key column value survives with probability ``factor`` under one
    global hash, and a row survives iff *all* its key values survive. The
    same threshold applies in every table, so a surviving child row's
    referenced entities are guaranteed to survive in their home tables
    (join results never dangle). Single-key entity tables shrink by
    ``factor``; k-key association tables shrink by ~``factor^k`` — a
    documented deviation from the paper's size-preserving sampler, traded
    for exact referential integrity.
    """
    if not 0 < factor <= 1:
        raise ValueError("scale_down factor must be in (0, 1]")
    out = Database(db.spark)
    thresh = int(factor * 10000)
    for name, t in db.tables.items():
        df = t.df
        if factor < 1.0:
            for c in _key_cols(db, name):
                df = df.filter(
                    F.pmod(F.xxhash64(F.col(c), F.lit(seed)), F.lit(10000))
                    < F.lit(thresh)
                )
        out.add(name, df, t.pk)
    return out


def scale_up(db: Database, factor: int) -> Database:
    """Union ``factor`` suffixed copies of every table (paper's row
    duplication with identifier-appended keys)."""
    if factor < 1:
        raise ValueError("scale_up factor must be >= 1")
    out = Database(db.spark)
    for name, t in db.tables.items():
        keys = _key_cols(db, name)
        parts: list[DataFrame] = [t.df]
        for i in range(1, factor):
            c = t.df
            for k in keys:
                c = c.withColumn(k, F.concat(F.col(k), F.lit(f"#{i}")))
            parts.append(c)
        df = parts[0]
        for p in parts[1:]:
            df = df.unionByName(p)
        out.add(name, df, t.pk)
    return out
