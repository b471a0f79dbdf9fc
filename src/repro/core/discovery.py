"""Candidate table retrieval — Set Similarity (Alg 3) + Diversify (Alg 4).

The heavy lifting is one distributed dataflow: the repository's
``(table, col, value)`` cells dataset is joined against the source table's
``(src_col, value)`` pairs, and per-``(table, col, src_col)`` containment
scores come out of a single groupBy. Everything after that — diversifying,
ranking, per-candidate verification, subsumption removal, renaming — works
on the small surviving candidate set, driver-side.

Two refinements beyond raw set containment (both deterministic, both in
the spirit of Alg 3's "verify overlap within aligned tuples" step; see
DESIGN.md §6):

* **Key-mapping disambiguation by pair match.** Dense integer domains make
  several candidate columns tie at containment 1.0 with the source key
  (o_orderkey ⊆ o_custkey ⊆ …). For every tied option we align the
  candidate on that option and measure the *cell match rate* of the mapped
  non-key columns (the fraction of aligned source keys whose values
  agree). The best option wins; if even the best alignment matches almost
  nothing, the key mapping is rejected and the table is treated as
  keyless — Expand then joins it through a proper key-bearing candidate.
* **Within-aligned-tuples overlap check** (Alg 3 lines 11-14): mapped
  non-key columns whose set overlap restricted to aligned tuples falls
  below τ are unmapped; candidates with no surviving non-key column are
  discarded.

Diversification (Alg 4) measures ``prevColOverlap`` on the
source-overlapping value sets ``C ∩ c`` (bounded by |S|); exact duplicate
tables — Example 9's case — are penalised identically.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.operators import as_strings
from repro.lake.repository import TableRepository, canon_str, to_spark

UNMAPPED_SEP = "__u__"  # unmapped columns keep "{table}__u__{col}" names
KEY_OPTION_EPS = 0.05  # containment slack for tied key-column options
MIN_KEY_MATCH = 0.15  # min mean cell-match rate to accept a key mapping
PANDAS_CAP = 300_000  # rows; larger candidate tables skip the pandas cache


@dataclass(eq=False)
class Candidate:
    """A candidate originating table, schema-matched to the source."""

    name: str
    df: DataFrame  # mapped cols renamed to source names; unmapped cols prefixed
    mapping: dict[str, str]  # source col -> original lake col
    col_overlaps: dict[str, float]  # source col -> containment score
    matched_values: dict[str, frozenset] = field(default_factory=dict)
    score: float = 0.0
    provenance: tuple[str, ...] = ()  # underlying lake tables (for Expand)
    pdf: pd.DataFrame | None = field(default=None, repr=False)  # renamed pandas cache

    def __post_init__(self):
        if not self.provenance:
            self.provenance = (self.name,)


def source_value_df(spark: SparkSession, source: pd.DataFrame) -> DataFrame:
    """Source table melted to distinct (src_col, value) pairs."""
    src = canon_str(source)
    frames = []
    for c in src.columns:
        vals = src[c].dropna().unique()
        frames.append(pd.DataFrame({"src_col": c, "value": list(vals)}))
    melted = pd.concat(frames, ignore_index=True) if frames else pd.DataFrame(
        columns=["src_col", "value"]
    )
    return to_spark(spark, melted)


def coarse_retrieve(
    spark: SparkSession, repo: TableRepository, source: pd.DataFrame, *, top_k: int = 100
) -> list[str]:
    """Starmie-substitute pre-retrieval: rank lake tables by total distinct
    shared-value mass with the source, keep the top-k (DESIGN.md §6)."""
    src_vals = source_value_df(spark, source).select("value").distinct()
    hits = (
        repo.cells(spark)
        .join(src_vals, on="value")
        .groupBy("table")
        .agg(F.countDistinct("value").alias("n"))
        .orderBy(F.desc("n"), "table")
        .limit(top_k)
    )
    return [r["table"] for r in hits.collect()]


def _column_containments(
    spark: SparkSession,
    repo: TableRepository,
    source: pd.DataFrame,
    restrict_to: list[str] | None,
) -> pd.DataFrame:
    """(table, col, src_col, overlap, matched value set) via one Spark job."""
    cells = repo.cells(spark)
    if restrict_to is not None:
        keep = to_spark(spark, pd.DataFrame({"table": sorted(restrict_to)}))
        cells = cells.join(keep, on="table", how="leftsemi")
    src = source_value_df(spark, source)
    src_canon = canon_str(source)
    src_sizes = {c: max(1, int(src_canon[c].dropna().nunique())) for c in source.columns}
    joined = (
        cells.join(src, on="value")
        .groupBy("table", "col", "src_col")
        .agg(
            F.countDistinct("value").alias("n_shared"),
            F.collect_set("value").alias("vals"),
        )
    )
    pdf = joined.toPandas()
    if len(pdf):
        # full column extents, for the Jaccard-style specificity signal:
        # a dense id column "contains" every small-int source column, but
        # its huge extent gives it a near-zero Jaccard
        hit_cols = to_spark(
            spark, pdf[["table", "col"]].drop_duplicates().astype(str)
        )
        extents = (
            cells.join(hit_cols, on=["table", "col"], how="leftsemi")
            .groupBy("table", "col")
            .agg(F.countDistinct("value").alias("extent"))
            .toPandas()
        )
        pdf = pdf.merge(extents, on=["table", "col"], how="left")
        pdf["extent"] = pdf["extent"].fillna(1).astype(int)
        pdf["overlap"] = pdf.apply(
            lambda r: r["n_shared"] / src_sizes[r["src_col"]], axis=1
        )
        pdf["jac"] = pdf.apply(
            lambda r: r["n_shared"]
            / max(1, src_sizes[r["src_col"]] + r["extent"] - r["n_shared"]),
            axis=1,
        )
        pdf["vals"] = pdf["vals"].map(frozenset)
        pdf = pdf.sort_values(
            ["src_col", "overlap", "table", "col"],
            ascending=[True, False, True, True],
        ).reset_index(drop=True)
    else:
        pdf["overlap"] = pd.Series(dtype=float)
        pdf["jac"] = pd.Series(dtype=float)
        pdf["extent"] = pd.Series(dtype=int)
    return pdf


def diversify_candidates(ranked: list[dict]) -> list[dict]:
    """Alg 4: re-score each candidate column against the previous one.

    ``ranked`` is a list of {table, overlap, vals} sorted by overlap desc.
    Returns the list re-sorted by diverseOverlapScore desc.
    """
    scored = []
    for i, cand in enumerate(ranked):
        if i == 0:
            score = cand["overlap"]
        else:
            prev = ranked[i - 1]
            denom = max(1, len(cand["vals"]))
            prev_overlap = len(cand["vals"] & prev["vals"]) / denom
            score = cand["overlap"] - prev_overlap
        scored.append({**cand, "div_score": score})
    return sorted(scored, key=lambda d: (-d["div_score"], d["table"]))


MIN_COL_MATCH = 0.1  # min per-column cell-match rate to keep a mapping
_SRC_SUFFIX = "\x00src"


def _refine_mapping(
    name: str,
    tbl: pd.DataFrame,
    options: dict[str, list[tuple[str, float, frozenset, float]]],
    source: pd.DataFrame,
    key_cols: list[str],
    tau: float,
) -> dict[str, str] | None:
    """Pick the best column mapping for one candidate (see module doc).

    ``options[src_col]`` lists (lake_col, containment, matched_vals,
    jaccard) by containment desc. Key mappings are scored by aligning the
    candidate on each near-tied key option and measuring per-column cell
    match rates against the source — every non-key option is tried and the
    best-matching one wins its source column (this is Alg 3's
    within-aligned-tuples verification, strengthened to positional
    matching; DESIGN.md §6). Keyless candidates fall back to a
    Jaccard-greedy assignment (containment alone is blind to a dense id
    column that "contains" every small-int source column).
    Returns {src_col: lake_col} or None to discard the candidate.
    """
    src = canon_str(source)
    nk_src = [s for s in options if s not in key_cols]

    def jac_mapping(exclude: set[str] = frozenset()) -> dict[str, str]:
        triples = sorted(
            (
                (s, col, jac)
                for s in nk_src
                for col, _ov, _vals, jac in options[s]
                if col not in exclude
            ),
            key=lambda t: (-t[2], t[0], t[1]),
        )
        used: set[str] = set()
        mapping: dict[str, str] = {}
        for s, col, _jac in triples:
            if s in mapping or col in used:
                continue
            mapping[s] = col
            used.add(col)
        return mapping

    if not all(k in options for k in key_cols) or not nk_src:
        return jac_mapping() or None

    per_key_opts: dict[str, list[str]] = {}
    for k in key_cols:
        best_ov = options[k][0][1]
        per_key_opts[k] = [
            col for col, ov, _v, _j in options[k] if ov >= best_ov - KEY_OPTION_EPS
        ][:3]

    src_keyed = src.drop_duplicates(key_cols)
    best_score, best_result = -1.0, None
    import itertools

    for combo in itertools.product(*[per_key_opts[k] for k in key_cols]):
        if len(set(combo)) != len(combo):
            continue
        kcols = list(combo)
        opt_cols = sorted(
            {col for s in nk_src for col, *_ in options[s]} - set(combo)
        )
        if not opt_cols:
            continue
        sub = tbl[kcols + opt_cols].drop_duplicates(kcols)
        merged = sub.merge(
            src_keyed,
            left_on=kcols,
            right_on=key_cols,
            how="inner",
            suffixes=("", _SRC_SUFFIX),
        )
        if merged.empty:
            continue
        # coverage factor: matching 4 of 10 source keys is weak evidence of
        # a real key alignment, however well those 4 rows agree
        coverage = len(merged) / max(1, len(src_keyed))
        # per source col: best-matching option column by cell match rate
        assign: dict[str, tuple[str, float]] = {}
        for s in nk_src:
            s_col = s + _SRC_SUFFIX if s + _SRC_SUFFIX in merged.columns else s
            svals = merged[s_col]
            nonnull = svals.notna()
            denom = int(nonnull.sum())
            if denom == 0:
                continue
            for col, _ov, _vals, _j in options[s]:
                if col in combo:
                    continue
                rate = float(((merged[col] == svals) & nonnull).sum()) / denom
                if rate >= MIN_COL_MATCH and (
                    s not in assign or rate > assign[s][1]
                ):
                    assign[s] = (col, rate)
        if not assign:
            continue
        # one source col per lake col: higher rate wins
        by_col: dict[str, tuple[str, float]] = {}
        for s, (col, rate) in assign.items():
            if col not in by_col or rate > by_col[col][1]:
                by_col[col] = (s, rate)
        nk_map = {s: col for col, (s, _r) in by_col.items()}
        score = (
            sum(by_col[c][1] for c in by_col) / len(by_col)
        ) * min(1.0, coverage)
        if score > best_score:
            best_score = score
            best_result = (dict(zip(key_cols, combo)), nk_map)

    if best_result is None or best_score < MIN_KEY_MATCH:
        # no credible key alignment: treat as keyless (Expand's job)
        return jac_mapping() or None

    key_option, nk_map = best_result
    return {**key_option, **nk_map}


def set_similarity(
    spark: SparkSession,
    repo: TableRepository,
    source: pd.DataFrame,
    key_cols: list[str],
    *,
    tau: float = 0.2,
    k_per_col: int = 10,
    max_candidates: int = 25,
    restrict_to: list[str] | None = None,
) -> list[Candidate]:
    """Alg 3: retrieve, diversify, verify, de-subsume and rename candidates."""
    stats = _column_containments(spark, repo, source, restrict_to)
    stats = stats[stats["overlap"] >= tau]
    if not len(stats):
        return []

    # per source column: options per table, ranked + diversified
    table_scores: dict[str, list[float]] = {}
    options: dict[str, dict[str, list[tuple[str, float, frozenset, float]]]] = {}
    for src_col, grp in stats.groupby("src_col", sort=True):
        for r in grp.itertuples():
            options.setdefault(r.table, {}).setdefault(src_col, []).append(
                (r.col, r.overlap, r.vals, r.jac)
            )
        best = grp.drop_duplicates("table").head(k_per_col)
        ranked = [
            {"table": r.table, "col": r.col, "overlap": r.overlap, "vals": r.vals}
            for r in best.itertuples()
        ]
        for d in diversify_candidates(ranked):
            table_scores.setdefault(d["table"], []).append(d["div_score"])

    order = sorted(
        table_scores,
        key=lambda t: (-(sum(table_scores[t]) / len(table_scores[t])), t),
    )[:max_candidates]

    cands: list[Candidate] = []
    for name in order:
        tbl = repo.load_pdf(name)
        mapping = _refine_mapping(
            name, tbl, options[name], source, list(key_cols), tau
        )
        if not mapping:
            continue
        opt = options[name]
        overlaps = {
            s: next((ov for c, ov, _v, _j in opt.get(s, []) if c == col), 0.0)
            for s, col in mapping.items()
        }
        matched = {
            s: next((v for c, _ov, v, _j in opt.get(s, []) if c == col), frozenset())
            for s, col in mapping.items()
        }
        renamed_pdf = _rename_pdf(tbl, name, mapping)
        cands.append(
            Candidate(
                name=name,
                df=_rename(repo.load(spark, name), name, mapping),
                mapping=mapping,
                col_overlaps=overlaps,
                matched_values=matched,
                score=sum(table_scores[name]) / len(table_scores[name]),
                pdf=renamed_pdf if len(tbl) <= PANDAS_CAP else None,
            )
        )

    return _remove_subsumed(cands)


def _rename(df: DataFrame, name: str, mapping: dict[str, str]) -> DataFrame:
    """Rename mapped columns to source names; prefix unmapped ones."""
    inv = {c: s for s, c in mapping.items()}
    cols = [
        F.col(c).alias(inv.get(c, f"{name}{UNMAPPED_SEP}{c}")) for c in df.columns
    ]
    return as_strings(df.select(cols))


def _rename_pdf(pdf: pd.DataFrame, name: str, mapping: dict[str, str]) -> pd.DataFrame:
    inv = {c: s for s, c in mapping.items()}
    out = pdf.copy()
    out.columns = [inv.get(c, f"{name}{UNMAPPED_SEP}{c}") for c in pdf.columns]
    return out


def _row_set(c: Candidate, cols: list[str]) -> frozenset | None:
    if c.pdf is None or any(col not in c.pdf.columns for col in cols):
        return None
    sub = c.pdf[cols]
    return frozenset(
        tuple(None if pd.isna(v) else v for v in r)
        for r in sub.itertuples(index=False)
    )


def _remove_subsumed(cands: list[Candidate]) -> list[Candidate]:
    """Alg 3 line 15: drop candidates whose mapped columns and column
    values are contained in another candidate's.

    Checked at *row* level on the mapped-column projections (a candidate is
    redundant only if every one of its mapped tuples appears in the other —
    the Example 9 duplicate case). Value-set containment alone would also
    kill complementary corrupted variants whose low-cardinality columns
    happen to share extents. Falls back to matched-value containment when a
    candidate is too large for the pandas cache.
    """
    keep: list[Candidate] = []
    for i, a in enumerate(cands):
        subsumed = False
        a_cols = sorted(a.mapping)
        for j, b in enumerate(cands):
            if i == j or not (set(a.mapping) <= set(b.mapping)):
                continue
            ra, rb = _row_set(a, a_cols), _row_set(b, a_cols)
            if ra is not None and rb is not None:
                contained = ra <= rb
                strictly = ra < rb
            else:
                contained = all(
                    a.matched_values.get(s, frozenset())
                    <= b.matched_values.get(s, frozenset())
                    for s in a.mapping
                )
                strictly = any(
                    a.matched_values.get(s, frozenset())
                    < b.matched_values.get(s, frozenset())
                    for s in a.mapping
                )
            if contained and (
                set(a.mapping) != set(b.mapping) or strictly or j < i
            ):
                subsumed = True
                break
        if not subsumed:
            keep.append(a)
    return keep
