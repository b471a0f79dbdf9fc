"""Gen-T integration operators (paper §IV-B, Theorem 8).

The representative operator set is {⊎ outer union, σ select, π project,
β subsumption, κ complementation}. β and κ compare tuple *pairs*; after
Gen-T's ProjectSelect every tuple carries a non-null source-key value and
tuples with different keys can neither subsume nor complement each other
(they disagree on a shared non-null attribute). So the Spark versions
shuffle by the key columns and run the exact pairwise kernels per key
group via ``applyInPandas`` (DESIGN.md §4.3) — the same partitioning a JVM
physical operator would use.

All inputs are all-string DataFrames (lake canonical form); nulls are SQL
NULL / None.
"""
from __future__ import annotations

from typing import Callable, Iterable, Sequence

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

# Groups larger than this skip pairwise β/κ (returned unchanged) so one
# degenerate block cannot make the whole job quadratic; baselines that rely
# on unkeyed complementation (ALITE) hit this instead of hanging — the
# paper's analogue is their wall-clock timeout.
MAX_PAIRWISE_GROUP = 2000


def as_strings(df: DataFrame) -> DataFrame:
    """Cast every column to string (idempotent on canonical lake tables)."""
    return df.select([F.col(c).cast("string").alias(c) for c in df.columns])


def outer_union(left: DataFrame, right: DataFrame) -> DataFrame:
    """⊎ — natural outer union: union of columns, nulls where absent."""
    return as_strings(left).unionByName(as_strings(right), allowMissingColumns=True)


def outer_union_all(dfs: Sequence[DataFrame]) -> DataFrame:
    if not dfs:
        raise ValueError("outer_union_all needs at least one table")
    acc = as_strings(dfs[0])
    for d in dfs[1:]:
        acc = outer_union(acc, d)
    return acc


def inner_union_groups(dfs: Sequence[DataFrame]) -> list[DataFrame]:
    """InnerUnion (Alg 2 line 4): union tables that share the same schema."""
    groups: dict[frozenset, DataFrame] = {}
    for d in dfs:
        k = frozenset(d.columns)
        groups[k] = d if k not in groups else groups[k].unionByName(d)
    return list(groups.values())


def project_select(
    df: DataFrame, source_cols: Sequence[str], key_cols: Sequence[str], source_keys: DataFrame
) -> DataFrame:
    """ProjectSelect (Alg 2 line 3): π to S's columns, σ to S's key values.

    ``source_keys`` is a DataFrame of the distinct key tuples of S. Tables
    reaching integration always contain the key columns (Expand guarantees
    it); we guard anyway.
    """
    missing = [k for k in key_cols if k not in df.columns]
    if missing:
        raise ValueError(f"table lacks source key columns {missing}")
    keep = [c for c in df.columns if c in set(source_cols)]
    proj = as_strings(df).select(keep)
    return proj.join(as_strings(source_keys).distinct(), on=list(key_cols), how="leftsemi")


# ---------------------------------------------------------------------------
# pure-pandas pairwise kernels (unit-testable without Spark)
# ---------------------------------------------------------------------------

def _rows(pdf: pd.DataFrame) -> list[tuple]:
    return [tuple(None if pd.isna(v) else v for v in r) for r in pdf.itertuples(index=False)]


def _subsumes(t1: tuple, t2: tuple) -> bool:
    """t1 subsumes t2: agree wherever both non-null, t1 ⊋ t2 on non-nulls."""
    strictly_more = False
    for a, b in zip(t1, t2):
        if a is not None and b is not None:
            if a != b:
                return False
        elif b is not None:  # a null where b non-null
            return False
        elif a is not None:  # a non-null where b null
            strictly_more = True
    return strictly_more


def _complements(t1: tuple, t2: tuple) -> bool:
    """t1, t2 complement: share ≥1 equal non-null, agree on all shared
    non-nulls, and each fills at least one null of the other."""
    shared = fills1 = fills2 = False
    for a, b in zip(t1, t2):
        if a is not None and b is not None:
            if a != b:
                return False
            shared = True
        elif a is not None:
            fills2 = True
        elif b is not None:
            fills1 = True
    return shared and fills1 and fills2


def _merge(t1: tuple, t2: tuple) -> tuple:
    return tuple(a if a is not None else b for a, b in zip(t1, t2))


def subsume_pdf(pdf: pd.DataFrame) -> pd.DataFrame:
    """β on a pandas frame: drop duplicates and subsumed tuples."""
    rows = list(dict.fromkeys(_rows(pdf)))
    if len(rows) > MAX_PAIRWISE_GROUP:
        return pd.DataFrame(rows, columns=list(pdf.columns), dtype=object)
    keep = []
    for i, t2 in enumerate(rows):
        if any(i != j and _subsumes(t1, t2) for j, t1 in enumerate(rows)):
            continue
        keep.append(t2)
    return pd.DataFrame(keep, columns=list(pdf.columns), dtype=object)


def complement_pdf(pdf: pd.DataFrame) -> pd.DataFrame:
    """κ on a pandas frame: repeatedly merge complementing pairs to fixpoint."""
    rows = list(dict.fromkeys(_rows(pdf)))
    if len(rows) > MAX_PAIRWISE_GROUP:
        return pd.DataFrame(rows, columns=list(pdf.columns), dtype=object)
    changed = True
    while changed:
        changed = False
        n = len(rows)
        for i in range(n):
            for j in range(i + 1, n):
                if _complements(rows[i], rows[j]):
                    merged = _merge(rows[i], rows[j])
                    rows = [r for k, r in enumerate(rows) if k not in (i, j)]
                    if merged not in rows:
                        rows.append(merged)
                    changed = True
                    break
            if changed:
                break
    return pd.DataFrame(rows, columns=list(pdf.columns), dtype=object)


def minimal_form_pdf(pdf: pd.DataFrame) -> pd.DataFrame:
    """TakeMinimalForm (Alg 2 line 6): dedup, then κ, then β."""
    return subsume_pdf(complement_pdf(pdf))


CLOSURE_CAP = 400  # max tuples materialised per complementation closure


def complement_closure_pdf(pdf: pd.DataFrame) -> pd.DataFrame:
    """Complementation *closure*: all maximal merge combinations.

    Gen-T's κ replaces a complementing pair with its merge; Full
    Disjunction (ALITE) instead contains every maximal combination of
    join-consistent tuples — a tuple may combine with several mutually
    conflicting partners and all outcomes must appear. We grow the closure
    (originals + every pairwise merge) to a fixpoint, capped at
    ``CLOSURE_CAP`` tuples per block, then drop subsumed tuples.
    """
    rows = list(dict.fromkeys(_rows(pdf)))
    if len(rows) > MAX_PAIRWISE_GROUP:
        return pd.DataFrame(rows, columns=list(pdf.columns), dtype=object)
    all_rows: set[tuple] = set(rows)
    changed = True
    while changed and len(all_rows) < CLOSURE_CAP:
        changed = False
        lst = sorted(all_rows, key=lambda t: tuple((v is None, v or "") for v in t))
        for i in range(len(lst)):
            for j in range(i + 1, len(lst)):
                if _complements(lst[i], lst[j]):
                    m = _merge(lst[i], lst[j])
                    if m not in all_rows:
                        all_rows.add(m)
                        changed = True
                        if len(all_rows) >= CLOSURE_CAP:
                            break
            if len(all_rows) >= CLOSURE_CAP:
                break
    return subsume_pdf(
        pd.DataFrame(list(all_rows), columns=list(pdf.columns), dtype=object)
    )


# ---------------------------------------------------------------------------
# Spark wrappers
# ---------------------------------------------------------------------------

def _apply_per_group(
    df: DataFrame, group_cols: Sequence[str], fn: Callable[[pd.DataFrame], pd.DataFrame]
) -> DataFrame:
    df = as_strings(df)
    cols = list(df.columns)

    def _f(pdf: pd.DataFrame) -> pd.DataFrame:
        out = fn(pdf[cols])
        return out[cols].astype(object).where(out[cols].notna(), None)

    return df.groupBy([F.col(c) for c in group_cols]).applyInPandas(_f, schema=df.schema)


def subsumption(df: DataFrame, key_cols: Sequence[str]) -> DataFrame:
    """β over a keyed table — exact, distributed by key group."""
    return _apply_per_group(df, key_cols, subsume_pdf)


def complementation(df: DataFrame, key_cols: Sequence[str]) -> DataFrame:
    """κ over a keyed table — exact, distributed by key group."""
    return _apply_per_group(df, key_cols, complement_pdf)


def minimal_form(df: DataFrame, key_cols: Sequence[str]) -> DataFrame:
    """Dedup + κ + β per key group (Alg 2 TakeMinimalForm)."""
    return _apply_per_group(df, key_cols, minimal_form_pdf)


def add_missing_null_columns(df: DataFrame, source_cols: Iterable[str]) -> DataFrame:
    """Alg 2 lines 15-16: pad T_result with null columns so schema matches S."""
    out = df
    for c in source_cols:
        if c not in out.columns:
            out = out.withColumn(c, F.lit(None).cast("string"))
    return out.select(list(source_cols))
