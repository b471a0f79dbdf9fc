"""Table Integration (paper §V-B, Alg 2).

Pipeline per source table:
  1. ProjectSelect — π to S's columns, σ to S's key values (Spark semi-join);
  2. InnerUnion   — union tables sharing a schema;
  3. LabelSourceNulls — S's nulls become unique labelled non-null values in
     both a working copy of S and any key-aligned table null at the same
     position, so κ/β cannot over-combine through "correct" nulls
     (Example 10's Smith tuple);
  4. TakeMinimalForm — dedup + κ + β per key group;
  5. iterated outer union, applying κ / β only when they do not lower the
     EIS against the labelled source (Alg 2 lines 10-13);
  6. RemoveLabeledNulls + pad missing source columns.

All table surgery is DataFrame-level; EIS checks collect only the (small,
key-selected) working table.
"""
from __future__ import annotations

from typing import Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core import metrics_core as mc
from repro.core import operators as ops
from repro.lake.repository import canon_str

LABEL_PREFIX = "##NULL##"
_KEY_SEP = "\x1f"


def _label(key: tuple, col: str) -> str:
    return f"{LABEL_PREFIX}{_KEY_SEP.join('' if k is None else k for k in key)}{_KEY_SEP}{col}"


def label_source_nulls(source: pd.DataFrame, key_cols: Sequence[str]) -> pd.DataFrame:
    """Working copy of S with each null replaced by a unique label."""
    src = canon_str(source).reset_index(drop=True)
    out = src.copy()
    for i in range(len(src)):
        key = tuple(src.loc[i, list(key_cols)])
        for c in src.columns:
            if c not in key_cols and pd.isna(src.loc[i, c]):
                out.loc[i, c] = _label(key, c)
    return out


def apply_null_labels(
    spark: SparkSession,
    df: DataFrame,
    labeled_source: pd.DataFrame,
    key_cols: Sequence[str],
) -> DataFrame:
    """Substitute labels into key-aligned table nulls at S's null positions."""
    lbl_cols = [c for c in labeled_source.columns if c not in key_cols]
    lbl = labeled_source.copy()
    rename = {}
    for c in lbl_cols:
        is_label = lbl[c].map(lambda v: isinstance(v, str) and v.startswith(LABEL_PREFIX))
        lbl[c] = lbl[c].where(is_label, None)
        rename[c] = f"__lbl_{c}"
    lbl = lbl.rename(columns=rename)
    lbl = lbl.where(lbl.notna(), None)
    from repro.lake.repository import to_spark

    lbl_df = to_spark(spark, lbl)
    joined = df.join(lbl_df, on=list(key_cols), how="left")
    exprs = []
    for c in df.columns:
        if c in key_cols or c not in labeled_source.columns:
            exprs.append(F.col(c))
        else:
            exprs.append(F.coalesce(F.col(c), F.col(f"__lbl_{c}")).alias(c))
    return joined.select(exprs)


def remove_labeled_nulls(df: DataFrame) -> DataFrame:
    """Invert the labelling: any label value becomes NULL again."""
    exprs = [
        F.when(F.col(c).startswith(LABEL_PREFIX), F.lit(None)).otherwise(F.col(c)).alias(c)
        for c in df.columns
    ]
    return df.select(exprs)


def _eis_of(df: DataFrame, labeled_source: pd.DataFrame, key_cols: Sequence[str]) -> float:
    pdf = df.toPandas()
    return mc.eis(labeled_source, pdf, key_cols)


def integrate(
    spark: SparkSession,
    tables: Sequence[DataFrame],
    source: pd.DataFrame,
    key_cols: Sequence[str],
) -> DataFrame | None:
    """Alg 2 — integrate originating tables into a reclaimed table."""
    if not tables:
        return None
    source = source.reset_index(drop=True)
    src_cols = list(source.columns)
    from repro.lake.repository import to_spark

    keys_df = to_spark(spark, source[list(key_cols)].drop_duplicates())

    pre = []
    for t in tables:
        try:
            ps = ops.project_select(t, src_cols, key_cols, keys_df)
        except ValueError:
            continue
        pre.append(ps)
    if not pre:
        return None

    unioned = ops.inner_union_groups(pre)
    labeled_source = label_source_nulls(source, key_cols)
    labeled = [
        apply_null_labels(spark, t, labeled_source, key_cols) for t in unioned
    ]
    minimal = [
        ops.minimal_form(t, key_cols).localCheckpoint(eager=True) for t in labeled
    ]

    acc: DataFrame | None = None
    for t in minimal:
        acc = t if acc is None else ops.outer_union(acc, t)
        acc = acc.localCheckpoint(eager=True)
        base = _eis_of(acc, labeled_source, key_cols)
        comp = ops.complementation(acc, key_cols).localCheckpoint(eager=True)
        if _eis_of(comp, labeled_source, key_cols) >= base:
            acc = comp
            base = _eis_of(acc, labeled_source, key_cols)
        sub = ops.subsumption(acc, key_cols).localCheckpoint(eager=True)
        if _eis_of(sub, labeled_source, key_cols) >= base:
            acc = sub

    result = remove_labeled_nulls(acc)
    return ops.add_missing_null_columns(result, src_cols)
