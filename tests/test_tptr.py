"""TP-TR benchmark generator: variants, sources, integrating sets."""
import duckdb
import numpy as np
import pandas as pd
import pytest

from repro.bench import tptr

SF = 0.001
N = 12


@pytest.fixture(scope="module")
def originals(spark):
    return tptr.original_tables(spark, SF, seed=0)


@pytest.fixture(scope="module")
def bench(spark, tmp_path_factory):
    root = tmp_path_factory.mktemp("tptr_small")
    return tptr.build_tptr(spark, root, sf=SF, target_rows=N, seed=0)


class TestOriginals:
    def test_eight_tables(self, originals):
        assert set(originals) == set(tptr.TPCH_KEYS)

    def test_all_string(self, originals):
        for pdf in originals.values():
            assert all(pdf[c].map(lambda v: v is None or isinstance(v, str)).all()
                       for c in pdf.columns)

    def test_keys_unique(self, originals):
        for name, pdf in originals.items():
            k = tptr.TPCH_KEYS[name]
            assert not pdf.duplicated(k).any(), name

    def test_deterministic(self, spark, originals):
        again = tptr.original_tables(spark, SF, seed=0)
        for name in originals:
            pd.testing.assert_frame_equal(originals[name], again[name])

    def test_fk_integrity_customer_nation(self, originals):
        nk = set(originals["nation"]["n_nationkey"])
        assert set(originals["customer"]["c_nationkey"]) <= nk


class TestVariants:
    @pytest.fixture(scope="class")
    def variants(self, originals):
        return tptr.make_variants("orders", originals["orders"], seed=7)

    def test_four_variants(self, variants):
        assert set(variants) == set(tptr.VARIANT_SUFFIXES)

    def test_keys_never_corrupted(self, originals, variants):
        for v in variants.values():
            assert v["o_orderkey"].tolist() == originals["orders"]["o_orderkey"].tolist()

    def test_null_masks_complementary(self, originals, variants):
        orig = originals["orders"]
        a, b = variants["null_a"], variants["null_b"]
        for c in orig.columns:
            if c == "o_orderkey":
                continue
            a_null = a[c].isna().to_numpy()
            b_null = b[c].isna().to_numpy()
            orig_nonnull = orig[c].notna().to_numpy()
            # wherever the original is non-null, exactly one variant nulls it
            assert not np.any(a_null & b_null & orig_nonnull)
            # union of the two restores the original values
            merged = a[c].combine_first(b[c])
            assert merged.tolist() == orig[c].tolist()

    def test_null_rate_about_half(self, variants, originals):
        a = variants["null_a"]
        nk = [c for c in a.columns if c != "o_orderkey"]
        rate = float(a[nk].isna().to_numpy().mean())
        assert 0.35 < rate < 0.65

    def test_error_values_are_fresh_strings(self, originals, variants):
        orig_vals = set(originals["orders"].to_numpy().ravel())
        e = variants["err_a"]
        nk = [c for c in e.columns if c != "o_orderkey"]
        errs = [v for c in nk for v in e[c] if isinstance(v, str) and v.startswith("err_")]
        assert errs
        assert not (set(errs) & orig_vals)

    def test_error_rate_tunable(self, originals):
        v = tptr.make_variants("orders", originals["orders"], seed=7, pct_err=0.9)
        e = v["err_a"]
        nk = [c for c in e.columns if c != "o_orderkey"]
        rate = float(np.mean([
            str(x).startswith("err_") for c in nk for x in e[c]
        ]))
        assert rate > 0.8

    def test_null_rate_tunable(self, originals):
        v = tptr.make_variants("orders", originals["orders"], seed=7, pct_null=0.1)
        a = v["null_a"]
        nk = [c for c in a.columns if c != "o_orderkey"]
        assert float(a[nk].isna().to_numpy().mean()) < 0.2


class TestSources:
    def test_26_sources(self, bench):
        assert len(bench.sources) == 26

    def test_keys_unique_in_each_source(self, bench):
        for s in bench.sources:
            assert not s.table.duplicated(s.key_cols).any(), s.name

    def test_key_cols_present(self, bench):
        for s in bench.sources:
            assert set(s.key_cols) <= set(s.table.columns), s.name

    def test_sources_nonempty(self, bench):
        for s in bench.sources:
            assert len(s.table) > 0, s.name

    def test_outer_join_sources_contain_nulls(self, bench):
        q18 = next(s for s in bench.sources if s.name == "q18")
        assert q18.table.isna().any().any()

    def test_ops_range(self, bench):
        ops = [s.n_ops for s in bench.sources]
        assert min(ops) == 2 and max(ops) == 9

    def test_q09_matches_duckdb(self, originals, bench):
        q09 = next(s for s in bench.sources if s.name == "q09")
        keys = list(q09.table["o_orderkey"])
        con = duckdb.connect()
        con.register("orders", originals["orders"])
        con.register("customer", originals["customer"])
        ph = ",".join(f"'{k}'" for k in keys)
        exp = con.execute(
            "SELECT o_orderkey, o_totalprice, c_acctbal, c_mktsegment "
            "FROM orders JOIN customer ON o_custkey = c_custkey "
            f"WHERE o_orderkey IN ({ph}) ORDER BY o_orderkey"
        ).fetchdf()
        got = q09.table.sort_values("o_orderkey").reset_index(drop=True)
        pd.testing.assert_frame_equal(
            got, exp.reset_index(drop=True), check_dtype=False
        )

    def test_q15_matches_duckdb(self, originals, bench):
        q15 = next(s for s in bench.sources if s.name == "q15")
        keys = list(q15.table["c_custkey"])
        con = duckdb.connect()
        con.register("customer", originals["customer"])
        con.register("nation", originals["nation"])
        ph = ",".join(f"'{k}'" for k in keys)
        exp = con.execute(
            "SELECT c_custkey, c_mktsegment, c_nationkey, n_name "
            "FROM customer JOIN nation ON c_nationkey = n_nationkey "
            f"WHERE c_custkey IN ({ph}) ORDER BY c_custkey"
        ).fetchdf()
        got = q15.table.sort_values("c_custkey").reset_index(drop=True)
        pd.testing.assert_frame_equal(got, exp.reset_index(drop=True), check_dtype=False)


class TestLake:
    def test_32_tables(self, bench):
        assert len(bench.repo.names()) == 32

    def test_anonymized_columns(self, bench):
        for n in bench.repo.names():
            assert all(c.startswith("c") for c in bench.repo.columns(n))

    def test_meta_records_origin(self, bench):
        m = bench.repo.meta("orders__null_a")
        assert m["origin"] == "orders"
        assert m["columns"][0] == "o_orderkey"

    def test_int_sets(self, bench):
        ints = bench.int_sets["q09"]
        assert len(ints) == 8  # 2 originals × 4 variants
        assert "orders__null_a" in ints and "customer__err_b" in ints
        for t in ints:
            assert t in bench.repo.names()

    def test_extra_tables_embedded(self, spark, tmp_path_factory):
        root = tmp_path_factory.mktemp("tptr_extra")
        extra = {"noise_1": pd.DataFrame({"x": ["a", "b"]})}
        b = tptr.build_tptr(
            spark, root, sf=SF, target_rows=N, seed=0, extra_tables=extra
        )
        assert "noise_1" in b.repo.names()
        assert len(b.repo.names()) == 33
