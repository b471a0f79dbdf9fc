"""TP-TR benchmark suite (paper §VI-A).

From the 8 TPC-H-lite tables we build, per benchmark scale:

* a data lake of 32 tables — 4 variants of each original: two *nullified*
  versions whose null masks form a complementary 50/50 partition of the
  non-key cells (the only reading under which the paper's 15-17/26
  *perfect* reclamations are achievable — κ of the two restores every
  cell; DESIGN.md §4.9), and two *erroneous* versions with independent
  random masks of cells replaced by fresh random strings;
* 26 Source Tables from seeded SPJ(outer-join)U queries over the
  *originals* (which are NOT in the lake), with 2–9 operators, ≤3-way
  joins and ≤4-way unions, mirroring the paper's query mix;
* the *integrating set* per source: all variants of the originals its
  query touched (the "w/ int. set" baseline inputs).

Lake tables get anonymized column names (``c0``, ``c1``, …): discovery
must recover the schema matching from values alone.

Scales (DESIGN.md §6): Small sf=0.001, Med sf=0.01, Large sf=0.1.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from pathlib import Path

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro import synth_data as sd
from repro.lake.repository import RepositoryBuilder, TableRepository, canon_str

TPCH_KEYS: dict[str, list[str]] = {
    "lineitem": ["l_orderkey", "l_linenumber"],
    "orders": ["o_orderkey"],
    "customer": ["c_custkey"],
    "part": ["p_partkey"],
    "supplier": ["s_suppkey"],
    "partsupp": ["ps_partkey", "ps_suppkey"],
    "nation": ["n_nationkey"],
    "region": ["r_regionkey"],
}

VARIANT_SUFFIXES = ("null_a", "null_b", "err_a", "err_b")


def original_tables(spark: SparkSession, sf: float, *, seed: int = 0) -> dict[str, pd.DataFrame]:
    """The 8 originals as canonical all-string pandas frames, key-deduped."""
    gens = {
        "lineitem": sd.lineitem,
        "orders": sd.orders,
        "customer": sd.customer,
        "part": sd.part,
        "supplier": sd.supplier,
        "partsupp": sd.partsupp,
        "nation": sd.nation,
        "region": sd.region,
    }
    out = {}
    for name, gen in gens.items():
        # zlib.crc32, not hash(): Python string hashing is randomized per
        # process and would make every run generate a different lake
        import zlib

        pdf = gen(spark, sf=sf, seed=seed + zlib.crc32(name.encode()) % 97).toPandas()
        pdf = canon_str(pdf)
        # the provided lineitem generator draws keys randomly; dedup so the
        # declared key actually is one (DESIGN.md §2.1)
        pdf = pdf.drop_duplicates(TPCH_KEYS[name]).reset_index(drop=True)
        out[name] = pdf
    return out


def make_variants(
    name: str,
    pdf: pd.DataFrame,
    *,
    seed: int,
    pct_null: float = 0.5,
    pct_err: float = 0.5,
) -> dict[str, pd.DataFrame]:
    """The 4 corrupted versions of one original (paper §VI-A).

    Keys are never corrupted — with corrupted keys no tuple could align at
    all (DESIGN.md §4.9). ``pct_null``/``pct_err`` support the Fig-7-style
    ablation. The two nullified masks partition the cells when
    pct_null=0.5; for other percentages they are drawn on complementary
    halves then thinned/grown to the requested rate.
    """
    keys = set(TPCH_KEYS[name])
    nk_cols = [c for c in pdf.columns if c not in keys]
    n = len(pdf)
    g = np.random.default_rng(seed)
    out: dict[str, pd.DataFrame] = {}

    shape = (n, len(nk_cols))
    half = g.random(shape) < 0.5  # complementary partition base
    if pct_null <= 0.5:
        # thin each half down to pct_null
        keep = g.random(shape) < (pct_null / 0.5)
        mask_a, mask_b = half & keep, (~half) & keep
    else:
        grow = g.random(shape) < ((pct_null - 0.5) / 0.5)
        mask_a, mask_b = half | ((~half) & grow), (~half) | (half & grow)
    for suffix, mask in (("null_a", mask_a), ("null_b", mask_b)):
        v = pdf.copy()
        for j, c in enumerate(nk_cols):
            col = v[c].to_numpy(dtype=object, copy=True)
            col[mask[:, j]] = None
            v[c] = col
        out[suffix] = v

    for suffix in ("err_a", "err_b"):
        mask = g.random(shape) < pct_err
        v = pdf.copy()
        for j, c in enumerate(nk_cols):
            col = v[c].to_numpy(dtype=object, copy=True)
            idx = np.nonzero(mask[:, j])[0]
            col[idx] = [f"err_{name}_{suffix}_{c}_{i}" for i in idx]
            v[c] = col
        out[suffix] = v
    return out


# ---------------------------------------------------------------------------
# the 26 source queries
# ---------------------------------------------------------------------------

def _slice(pdf: pd.DataFrame, key: str, start: int, n: int) -> pd.DataFrame:
    """Deterministic σ: rows whose key falls in the [start, start+n) slice
    of the sorted distinct key values."""
    vals = sorted(pdf[key].dropna().unique(), key=lambda v: (len(v), v))
    pick = set(vals[start : start + n])
    return pdf[pdf[key].isin(pick)]


def _merge(a: pd.DataFrame, b: pd.DataFrame, left: str, right: str, how: str = "inner"):
    out = a.merge(b, left_on=left, right_on=right, how=how)
    if right != left and right in out.columns:
        out = out.drop(columns=[right])
    return out


@dataclass
class SourceSpec:
    name: str
    key_cols: list[str]
    base_tables: list[str]  # originals the query touched → int. set
    n_ops: int  # operator count (for the Fig-6-style complexity split)
    table: pd.DataFrame = field(repr=False, default=None)


def build_sources(
    originals: dict[str, pd.DataFrame], *, target_rows: int
) -> list[SourceSpec]:
    """Execute the 26 seeded queries over the originals (DESIGN.md §2.1).

    ``target_rows`` caps result sizes via key-range selections (paper: avg
    27 rows on Small, ~1K on Med/Large).
    """
    o = originals
    N = target_rows
    specs: list[SourceSpec] = []

    def add(name, key_cols, base, n_ops, pdf):
        pdf = canon_str(pdf).drop_duplicates(key_cols).reset_index(drop=True)
        specs.append(SourceSpec(name, key_cols, base, n_ops, pdf))

    # -- simple select/project (2 ops) --
    add("q01", ["o_orderkey"], ["orders"], 2,
        _slice(o["orders"], "o_orderkey", 0, N)[
            ["o_orderkey", "o_custkey", "o_orderstatus", "o_totalprice", "o_orderdate"]])
    add("q02", ["c_custkey"], ["customer"], 2,
        _slice(o["customer"], "c_custkey", 0, N)[
            ["c_custkey", "c_nationkey", "c_acctbal", "c_mktsegment"]])
    add("q03", ["p_partkey"], ["part"], 2,
        _slice(o["part"], "p_partkey", 0, N)[
            ["p_partkey", "p_type", "p_brand", "p_size"]])
    add("q04", ["s_suppkey"], ["supplier"], 2,
        _slice(o["supplier"], "s_suppkey", 0, N)[
            ["s_suppkey", "s_name", "s_nationkey", "s_acctbal"]])
    li = o["lineitem"].drop_duplicates(["l_orderkey", "l_linenumber"])
    add("q05", ["l_orderkey", "l_linenumber"], ["lineitem"], 2,
        _slice(li, "l_orderkey", 0, max(4, N // 4))[
            ["l_orderkey", "l_linenumber", "l_quantity", "l_extendedprice", "l_shipdate"]])
    add("q06", ["ps_partkey", "ps_suppkey"], ["partsupp"], 2,
        _slice(o["partsupp"], "ps_partkey", 0, max(4, N // 4))[
            ["ps_partkey", "ps_suppkey", "ps_availqty", "ps_supplycost"]])
    add("q07", ["n_nationkey"], ["nation"], 2, o["nation"])
    add("q08", ["o_orderkey"], ["orders"], 2,
        _slice(o["orders"], "o_orderkey", N, N)[
            ["o_orderkey", "o_orderdate", "o_orderpriority"]])

    # -- joins (3-5 ops) --
    oc = _merge(o["orders"], o["customer"], "o_custkey", "c_custkey")
    add("q09", ["o_orderkey"], ["orders", "customer"], 3,
        _slice(oc, "o_orderkey", 0, N)[
            ["o_orderkey", "o_totalprice", "c_acctbal", "c_mktsegment"]])
    ocl = _merge(o["orders"], o["customer"], "o_custkey", "c_custkey", how="left")
    add("q10", ["o_orderkey"], ["orders", "customer"], 3,
        _slice(ocl, "o_orderkey", N // 2, N)[
            ["o_orderkey", "o_orderstatus", "o_custkey", "c_mktsegment"]])
    lo = _merge(li, o["orders"], "l_orderkey", "o_orderkey")
    add("q11", ["l_orderkey", "l_linenumber"], ["lineitem", "orders"], 3,
        _slice(lo, "l_orderkey", 0, max(4, N // 4))[
            ["l_orderkey", "l_linenumber", "l_quantity", "o_orderdate", "o_totalprice"]])
    lp = _merge(li, o["part"], "l_partkey", "p_partkey")
    add("q12", ["l_orderkey", "l_linenumber"], ["lineitem", "part"], 3,
        _slice(lp, "l_orderkey", 0, max(4, N // 4))[
            ["l_orderkey", "l_linenumber", "l_partkey", "p_brand", "p_type"]])
    pp = _merge(o["partsupp"], o["part"], "ps_partkey", "p_partkey")
    add("q13", ["ps_partkey", "ps_suppkey"], ["partsupp", "part"], 3,
        _slice(pp, "ps_partkey", 0, max(4, N // 4))[
            ["ps_partkey", "ps_suppkey", "ps_availqty", "p_brand", "p_size"]])
    pps = _merge(pp, o["supplier"], "ps_suppkey", "s_suppkey")
    add("q14", ["ps_partkey", "ps_suppkey"], ["partsupp", "part", "supplier"], 5,
        _slice(pps, "ps_partkey", 0, max(4, N // 4))[
            ["ps_partkey", "ps_suppkey", "p_type", "s_name", "ps_supplycost"]])
    cn = _merge(o["customer"], o["nation"], "c_nationkey", "n_nationkey")
    add("q15", ["c_custkey"], ["customer", "nation"], 3,
        _slice(cn, "c_custkey", 0, N)[
            ["c_custkey", "c_mktsegment", "c_nationkey", "n_name"]])
    snr = _merge(
        _merge(o["supplier"], o["nation"], "s_nationkey", "n_nationkey"),
        o["region"], "n_regionkey", "r_regionkey")
    add("q16", ["s_suppkey"], ["supplier", "nation", "region"], 5,
        _slice(snr, "s_suppkey", 0, N)[
            ["s_suppkey", "s_name", "n_name", "r_name"]])
    ocn = _merge(oc, o["nation"], "c_nationkey", "n_nationkey")
    add("q17", ["o_orderkey"], ["orders", "customer", "nation"], 5,
        _slice(ocn, "o_orderkey", 0, N)[
            ["o_orderkey", "o_totalprice", "c_mktsegment", "n_name"]])

    # -- outer joins over disjoint-ish selections (4-6 ops) --
    left = _slice(o["orders"], "o_orderkey", 0, N)[["o_orderkey", "o_totalprice"]]
    right = _slice(o["orders"], "o_orderkey", N // 2, N)[["o_orderkey", "o_orderpriority"]]
    add("q18", ["o_orderkey"], ["orders"], 5,
        left.merge(right, on="o_orderkey", how="outer"))
    cl = _slice(o["customer"], "c_custkey", 0, N)[["c_custkey", "c_mktsegment"]]
    cr = _slice(o["customer"], "c_custkey", N // 2, N)[["c_custkey", "c_acctbal"]]
    add("q25", ["c_custkey"], ["customer"], 5, cl.merge(cr, on="c_custkey", how="outer"))

    # -- unions (4-9 ops) --
    proj = ["o_orderkey", "o_custkey", "o_totalprice", "o_orderdate"]
    add("q19", ["o_orderkey"], ["orders"], 4,
        pd.concat([_slice(o["orders"], "o_orderkey", 0, N // 2)[proj],
                   _slice(o["orders"], "o_orderkey", N, N // 2)[proj]]))
    cproj = ["c_custkey", "c_nationkey", "c_mktsegment"]
    add("q20", ["c_custkey"], ["customer"], 4,
        pd.concat([_slice(o["customer"], "c_custkey", 0, N // 2)[cproj],
                   _slice(o["customer"], "c_custkey", N, N // 2)[cproj]]))
    pproj = ["p_partkey", "p_brand", "p_retailprice"]
    add("q21", ["p_partkey"], ["part"], 6,
        pd.concat([_slice(o["part"], "p_partkey", i * (N // 3), N // 3)[pproj]
                   for i in range(3)]))
    sproj = ["s_suppkey", "s_name", "s_nationkey"]
    add("q22", ["s_suppkey"], ["supplier"], 9,
        pd.concat([_slice(o["supplier"], "s_suppkey", i * max(2, N // 4), max(2, N // 4))[sproj]
                   for i in range(4)]))

    # -- join + union combos (6-7 ops) --
    jproj = ["o_orderkey", "o_orderdate", "c_mktsegment"]
    add("q23", ["o_orderkey"], ["orders", "customer"], 6,
        pd.concat([_slice(oc, "o_orderkey", 0, N // 2)[jproj],
                   _slice(oc, "o_orderkey", N, N // 2)[jproj]]))
    loc = _merge(lo, o["customer"], "o_custkey", "c_custkey")
    add("q24", ["l_orderkey", "l_linenumber"], ["lineitem", "orders", "customer"], 6,
        _slice(loc, "l_orderkey", 0, max(4, N // 4))[
            ["l_orderkey", "l_linenumber", "l_extendedprice", "o_orderdate", "c_mktsegment"]])
    psproj = ["ps_partkey", "ps_suppkey", "p_brand", "ps_availqty"]
    add("q26", ["ps_partkey", "ps_suppkey"], ["partsupp", "part"], 7,
        pd.concat([_slice(pp, "ps_partkey", 0, max(2, N // 8))[psproj],
                   _slice(pp, "ps_partkey", max(2, N // 4), max(2, N // 8))[psproj]]))

    specs.sort(key=lambda s: s.name)
    return specs


@dataclass
class TPTRBench:
    repo: TableRepository
    sources: list[SourceSpec]
    int_sets: dict[str, list[str]]  # source name -> lake table names


def build_tptr(
    spark: SparkSession,
    root: str | Path,
    *,
    sf: float,
    target_rows: int,
    seed: int = 0,
    pct_null: float = 0.5,
    pct_err: float = 0.5,
    extra_tables: dict[str, pd.DataFrame] | None = None,
) -> TPTRBench:
    """Build (or rebuild) a TP-TR lake + sources at the given scale.

    ``extra_tables`` lets callers embed the TP-TR lake into a larger noise
    lake (the SANTOS Large +TP-TR Med construction).
    """
    originals = original_tables(spark, sf, seed=seed)
    builder = RepositoryBuilder(root)
    for name, pdf in originals.items():
        variants = make_variants(
            name, pdf, seed=seed + 13 * (1 + sorted(originals).index(name)),
            pct_null=pct_null, pct_err=pct_err,
        )
        for suffix, v in variants.items():
            anon = v.copy()
            anon.columns = [f"c{i}" for i in range(len(v.columns))]
            builder.add(
                f"{name}__{suffix}", anon,
                meta={"origin": name, "variant": suffix, "columns": list(v.columns)},
            )
    if extra_tables:
        for name, pdf in extra_tables.items():
            builder.add(name, pdf)
    repo = builder.finish()

    sources = build_sources(originals, target_rows=target_rows)
    int_sets = {
        s.name: [f"{b}__{sfx}" for b in s.base_tables for sfx in VARIANT_SUFFIXES]
        for s in sources
    }
    return TPTRBench(repo=repo, sources=sources, int_sets=int_sets)
