"""Expand (Alg 5, App. C): give every candidate table the source key.

Candidates that do not map the source key columns (start nodes) are joined
through other candidates to ones that do (end nodes), along the best path
of a join graph. Edges connect candidates that share a joinable column;
following the paper, edge weights are the value overlap of the joinable
columns (a standard join-cardinality-style estimate). Join *materialisation*
is a Spark equi-join; edge weights come from the candidates' cached value
sets (sampled above ``_SAMPLE`` distinct values).

Path scoring departs from a plain max-sum DFS in one way: each extra hop
subtracts ``HOP_PENALTY``, and paths are capped at ``MAX_HOPS`` edges —
an unpenalised sum prefers absurd many-table chains, and the paper's own
sources join at most 3 tables.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.discovery import UNMAPPED_SEP, Candidate
from repro.lake.repository import TableRepository

MIN_JOIN_JACCARD = 0.3
MIN_JOIN_EXTENT = 4  # never equi-join on a near-constant column
HOP_PENALTY = 0.1
MAX_HOPS = 3
MAX_EXPANSIONS = 16
_SAMPLE = 20_000


def _value_sets(cand: Candidate, repo: TableRepository) -> dict[str, frozenset]:
    """Joinable-column value sets of a raw candidate (sampled).

    A column qualifies as a join candidate if it has at least
    MIN_JOIN_EXTENT distinct values *or* is near-unique within its table —
    the absolute floor rejects categorical domains in big tables without
    disqualifying the only (tiny) join column of a 3-row web table."""
    if len(cand.provenance) != 1:
        return {}
    pdf = cand.pdf
    if pdf is None:
        from repro.core.discovery import _rename_pdf

        pdf = _rename_pdf(repo.load_pdf(cand.name), cand.name, cand.mapping)
    n_rows = max(1, len(pdf))
    out = {}
    for col in pdf.columns:
        vals = pdf[col].dropna().unique()
        if len(vals) < MIN_JOIN_EXTENT and len(vals) < 0.8 * n_rows:
            continue
        if len(vals) > _SAMPLE:
            vals = vals[:_SAMPLE]
        out[col] = frozenset(vals)
    return out


def _edge(
    a: Candidate,
    b: Candidate,
    key_cols: list[str],
    vsets: dict[str, dict[str, frozenset]],
) -> tuple[str, str, float] | None:
    """Best join condition between two candidates: (colA, colB, weight).

    All column pairs compete on the Jaccard of their (full, sampled) value
    sets — ties go to the pair with the larger extents, so a dense FK
    column (custkey ↔ custkey) beats a small categorical domain that also
    happens to overlap. Columns below MIN_JOIN_EXTENT distinct values are
    never join candidates (a 5-value segment column would build a
    many-to-many mess)."""
    best: tuple[str, str, float, int] | None = None
    for ca, va in vsets.get(a.name, {}).items():
        for cb, vb in vsets.get(b.name, {}).items():
            inter = len(va & vb)
            if not inter:
                continue
            w = inter / len(va | vb)
            ext = min(len(va), len(vb))
            if w >= MIN_JOIN_JACCARD and (
                best is None or (w, ext) > (best[2], best[3])
            ):
                best = (ca, cb, w, ext)
    if best is None:
        return None
    return best[0], best[1], best[2]


def _best_paths(
    start: str,
    ends: set[str],
    adj: dict[str, list[tuple[str, float]]],
    *,
    top_p: int,
) -> list[list[str]]:
    """Hop-penalised DFS (Alg 5 with bounded depth).

    Returns the best path to each reachable end node, keeping the top-p end
    nodes by score. One path per end node matters because in a lake of
    corrupted variants (TP-TR) different end tables lose *different* join
    rows, and the traversal needs the alternatives to choose from."""
    best_per_end: dict[str, tuple[float, list[str]]] = {}

    def dfs(node: str, path: list[str], w: float) -> None:
        if node in ends:
            hops = len(path) - 1
            # bottleneck scoring: a join path keeps at most what its weakest
            # join keeps, and every extra hop costs — so a direct join beats
            # any detour through strongly-joined sibling tables
            score = w - HOP_PENALTY * (hops - 1)
            prev = best_per_end.get(node)
            if prev is None or score > prev[0] or (
                score == prev[0] and len(path) < len(prev[1])
            ):
                best_per_end[node] = (score, list(path))
            return  # a key-bearing node ends the path
        if len(path) - 1 >= MAX_HOPS:
            return
        for nxt, ew in sorted(adj.get(node, []), key=lambda t: (-t[1], t[0])):
            if nxt not in path:
                path.append(nxt)
                dfs(nxt, path, min(w, ew))
                path.pop()

    dfs(start, [start], float("inf"))
    ranked = sorted(
        best_per_end.items(), key=lambda kv: (-kv[1][0], len(kv[1][1]), kv[0])
    )
    return [p for _end, (_s, p) in ranked[:top_p]]


def expand(
    spark: SparkSession,
    repo: TableRepository,
    cands: list[Candidate],
    key_cols: list[str],
    *,
    top_p: int = 4,
    source: pd.DataFrame | None = None,
) -> list[Candidate]:
    """Replace keyless candidates by their best join-expansion to the key.

    Candidates with no path to a key-bearing candidate are dropped (their
    tuples can never align with the source)."""
    with_key = [c for c in cands if all(k in c.mapping for k in key_cols)]
    without = [c for c in cands if not all(k in c.mapping for k in key_cols)]
    if not without or not with_key:
        return with_key

    vsets = {c.name: _value_sets(c, repo) for c in cands}
    by_name = {c.name: c for c in cands}
    adj: dict[str, list[tuple[str, float]]] = {}
    edges: dict[tuple[str, str], tuple[str, str, float]] = {}
    names = sorted(by_name)
    for i, na in enumerate(names):
        for nb in names[i + 1 :]:
            e = _edge(by_name[na], by_name[nb], key_cols, vsets)
            if e:
                ca, cb, w = e
                adj.setdefault(na, []).append((nb, w))
                adj.setdefault(nb, []).append((na, w))
                edges[(na, nb)] = (ca, cb, w)
                edges[(nb, na)] = (cb, ca, w)

    ends = {c.name for c in with_key}
    out = list(with_key)
    n_expanded = 0
    # strongest keyless candidates expand first; global cap keeps the
    # downstream matrix/integration work bounded
    for c in sorted(without, key=lambda x: (-x.score, x.name)):
        if n_expanded >= MAX_EXPANSIONS:
            break
        for path in _best_paths(c.name, ends, adj, top_p=top_p):
            cand = _materialise_path(c, path, by_name, edges, key_cols, source)
            if cand is not None:
                out.append(cand)
                n_expanded += 1
                if n_expanded >= MAX_EXPANSIONS:
                    break
    return out


def _join_spark(df: DataFrame, right: DataFrame, ca: str, cb: str) -> DataFrame:
    """Inner equi-join on one column pair; shared names coalesce."""
    joined = df.join(right, on=df[ca] == right[cb], how="inner")
    out_cols = []
    seen: set[str] = set()
    for name in list(df.columns) + list(right.columns):
        if name in seen:
            continue
        seen.add(name)
        if name in df.columns and name in right.columns:
            out_cols.append(F.coalesce(df[name], right[name]).alias(name))
        elif name in df.columns:
            out_cols.append(df[name])
        else:
            out_cols.append(right[name])
    return joined.select(out_cols)


def _join_pdfs(
    lp: pd.DataFrame, rp: pd.DataFrame, ca: str, cb: str
) -> pd.DataFrame:
    """Pandas mirror of ``_join_spark`` (powers cheap matrix encoding)."""
    shared = [c for c in lp.columns if c in set(rp.columns)]
    merged = lp.merge(rp, left_on=ca, right_on=cb, how="inner", suffixes=("", "\x00r"))
    for c in shared:
        rc = f"{c}\x00r"
        if rc in merged.columns:
            merged[c] = merged[c].combine_first(merged[rc])
            merged = merged.drop(columns=[rc])
    if cb != ca and cb in merged.columns and cb not in lp.columns:
        pass  # keep the right-side join column (it may be a key column)
    return merged


def _materialise_path(
    start: Candidate,
    path: list[str],
    by_name: dict[str, Candidate],
    edges: dict[tuple[str, str], tuple[str, str, float]],
    key_cols: list[str],
    source: pd.DataFrame | None = None,
) -> Candidate | None:
    """Join along the path, then keep only the start table's mapped columns
    plus the key. The tables joined through are candidates in their own
    right — carrying their attribute columns through the chain would count
    their (possibly erroneous) values twice (DESIGN.md §6)."""
    df = start.df
    pdf = start.pdf
    mapping = dict(start.mapping)
    overlaps = dict(start.col_overlaps)
    matched = dict(start.matched_values)
    for prev, nxt in zip(path, path[1:]):
        ca, cb, _w = edges[(prev, nxt)]
        nxt_c = by_name[nxt]
        df = _join_spark(df, nxt_c.df, ca, cb)
        if pdf is not None and nxt_c.pdf is not None:
            pdf = _join_pdfs(pdf, nxt_c.pdf, ca, cb)
        else:
            pdf = None
        for k in key_cols:
            if k not in mapping and k in nxt_c.mapping:
                mapping[k] = nxt_c.mapping[k]
                overlaps[k] = nxt_c.col_overlaps.get(k, 0.0)
                if k in nxt_c.matched_values:
                    matched[k] = nxt_c.matched_values[k]
    if not all(k in mapping for k in key_cols):
        return None
    keep = list(dict.fromkeys(list(key_cols) + [s for s in start.mapping]))
    keep = [c for c in keep if c in df.columns]
    if not all(k in keep for k in key_cols):
        return None
    # prune mapped columns that do not actually match the source under the
    # now-available key alignment (a keyless candidate's containment-only
    # mapping can be wrong; cheap to check once the chain has a key)
    if source is not None and pdf is not None and all(c in pdf.columns for c in keep):
        from repro.lake.repository import canon_str

        src = canon_str(source).drop_duplicates(list(key_cols))
        merged = pdf[keep].drop_duplicates(list(key_cols)).merge(
            src, on=list(key_cols), how="inner", suffixes=("", "\x00s")
        )
        if len(merged):
            for c in list(keep):
                if c in key_cols:
                    continue
                s_col = c + "\x00s" if c + "\x00s" in merged.columns else c
                nonnull = merged[s_col].notna()
                denom = int(nonnull.sum())
                if denom == 0:
                    continue
                rate = float(((merged[c] == merged[s_col]) & nonnull).sum()) / denom
                if rate < 0.05:
                    keep.remove(c)
            if len(keep) <= len(key_cols):
                return None
    return Candidate(
        name="+".join(path),
        df=df.select(keep),
        mapping={s: c for s, c in mapping.items() if s in keep},
        col_overlaps={s: v for s, v in overlaps.items() if s in keep},
        matched_values={s: v for s, v in matched.items() if s in keep},
        score=start.score,
        provenance=tuple(p for n in path for p in by_name[n].provenance),
        pdf=pdf[keep] if pdf is not None and all(c in pdf.columns for c in keep) else None,
    )
