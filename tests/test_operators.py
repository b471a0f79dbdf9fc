"""Integration operators: pure kernels, Spark wrappers, Theorem 8 lemmas."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import operators as ops


def rows(df):
    """Spark DF → sorted list of value tuples (None-normalized)."""
    return sorted(
        (tuple(r[c] for c in sorted(df.columns)) for r in df.collect()),
        key=lambda t: tuple((v is None, v or "") for v in t),
    )


# ---------------------------------------------------------------------------
# pure pandas kernels
# ---------------------------------------------------------------------------

class TestSubsumePdf:
    def test_removes_subsumed(self):
        pdf = pd.DataFrame({"a": ["1", "1"], "b": ["x", None]}, dtype=object)
        out = ops.subsume_pdf(pdf)
        assert len(out) == 1
        assert out.iloc[0].tolist() == ["1", "x"]

    def test_keeps_conflicting(self):
        pdf = pd.DataFrame({"a": ["1", "1"], "b": ["x", "y"]}, dtype=object)
        assert len(ops.subsume_pdf(pdf)) == 2

    def test_dedups(self):
        pdf = pd.DataFrame({"a": ["1", "1"], "b": ["x", "x"]}, dtype=object)
        assert len(ops.subsume_pdf(pdf)) == 1

    def test_chain_subsumption(self):
        pdf = pd.DataFrame(
            {"a": ["1", "1", "1"], "b": ["x", "x", None], "c": ["z", None, None]},
            dtype=object,
        )
        out = ops.subsume_pdf(pdf)
        assert len(out) == 1
        assert out.iloc[0].tolist() == ["1", "x", "z"]

    def test_all_null_row_subsumed(self):
        pdf = pd.DataFrame({"a": ["1", None], "b": [None, None]}, dtype=object)
        out = ops.subsume_pdf(pdf)
        assert len(out) == 1

    def test_disjoint_nonnull_not_subsumed(self):
        pdf = pd.DataFrame({"a": ["1", None], "b": [None, "y"]}, dtype=object)
        assert len(ops.subsume_pdf(pdf)) == 2

    def test_empty(self):
        pdf = pd.DataFrame({"a": [], "b": []}, dtype=object)
        assert len(ops.subsume_pdf(pdf)) == 0


class TestComplementPdf:
    def test_merges_complements(self):
        pdf = pd.DataFrame(
            {"k": ["1", "1"], "a": ["x", None], "b": [None, "y"]}, dtype=object
        )
        out = ops.complement_pdf(pdf)
        assert len(out) == 1
        assert out.iloc[0].tolist() == ["1", "x", "y"]

    def test_no_shared_value_no_merge(self):
        pdf = pd.DataFrame(
            {"k": ["1", "2"], "a": ["x", None], "b": [None, "y"]}, dtype=object
        )
        assert len(ops.complement_pdf(pdf)) == 2

    def test_conflict_no_merge(self):
        pdf = pd.DataFrame(
            {"k": ["1", "1"], "a": ["x", "z"], "b": [None, "y"]}, dtype=object
        )
        assert len(ops.complement_pdf(pdf)) == 2

    def test_transitive_merge(self):
        pdf = pd.DataFrame(
            {
                "k": ["1", "1", "1"],
                "a": ["x", None, None],
                "b": [None, "y", None],
                "c": [None, None, "z"],
            },
            dtype=object,
        )
        out = ops.complement_pdf(pdf)
        assert len(out) == 1
        assert out.iloc[0].tolist() == ["1", "x", "y", "z"]

    def test_subsuming_pair_is_not_complementing(self):
        # t1 strictly more informative than t2: subsumption's job, not κ's
        pdf = pd.DataFrame({"k": ["1", "1"], "a": ["x", None]}, dtype=object)
        out = ops.complement_pdf(pdf)
        assert len(out) == 2

    def test_fig3_nullified_pair_restores_tuple(self):
        # the TP-TR perfect-reclamation mechanism: two complementary
        # nullified variants merge back into the original tuple
        pdf = pd.DataFrame(
            {
                "k": ["7", "7"],
                "a": ["v1", None],
                "b": [None, "v2"],
                "c": ["v3", "v3"],
            },
            dtype=object,
        )
        out = ops.complement_pdf(pdf)
        assert len(out) == 1
        assert out.iloc[0].tolist() == ["7", "v1", "v2", "v3"]


class TestMinimalForm:
    def test_dedup_complement_subsume(self):
        pdf = pd.DataFrame(
            {
                "k": ["1", "1", "1", "1"],
                "a": ["x", "x", "x", None],
                "b": [None, None, "y", "y"],
            },
            dtype=object,
        )
        out = ops.minimal_form_pdf(pdf)
        assert len(out) == 1
        assert out.iloc[0].tolist() == ["1", "x", "y"]


# ---------------------------------------------------------------------------
# Spark wrappers
# ---------------------------------------------------------------------------

class TestOuterUnion:
    def test_union_of_columns(self, spark):
        t1 = spark.createDataFrame(pd.DataFrame({"k": ["1"], "a": ["x"]}))
        t2 = spark.createDataFrame(pd.DataFrame({"k": ["2"], "b": ["y"]}))
        out = ops.outer_union(t1, t2)
        assert set(out.columns) == {"k", "a", "b"}
        got = {tuple(r) for r in out.select("k", "a", "b").collect()}
        assert got == {("1", "x", None), ("2", None, "y")}

    def test_same_schema_is_inner_union(self, spark):
        t1 = spark.createDataFrame(pd.DataFrame({"k": ["1"], "a": ["x"]}))
        t2 = spark.createDataFrame(pd.DataFrame({"k": ["2"], "a": ["y"]}))
        out = ops.outer_union(t1, t2)
        assert set(out.columns) == {"k", "a"}
        assert out.count() == 2

    def test_commutative(self, spark):
        t1 = spark.createDataFrame(pd.DataFrame({"k": ["1"], "a": ["x"]}))
        t2 = spark.createDataFrame(pd.DataFrame({"k": ["2"], "b": ["y"]}))
        assert rows(ops.outer_union(t1, t2)) == rows(ops.outer_union(t2, t1))

    def test_outer_union_all(self, spark):
        dfs = [
            spark.createDataFrame(pd.DataFrame({"k": [str(i)], f"c{i}": ["v"]}))
            for i in range(3)
        ]
        out = ops.outer_union_all(dfs)
        assert set(out.columns) == {"k", "c0", "c1", "c2"}
        assert out.count() == 3


class TestProjectSelect:
    def test_projects_and_selects(self, spark):
        t = spark.createDataFrame(
            pd.DataFrame(
                {"k": ["1", "2", "3"], "a": ["x", "y", "z"], "junk": ["j"] * 3}
            )
        )
        keys = spark.createDataFrame(pd.DataFrame({"k": ["1", "2"]}))
        out = ops.project_select(t, ["k", "a"], ["k"], keys)
        assert set(out.columns) == {"k", "a"}
        assert out.count() == 2

    def test_missing_key_raises(self, spark):
        t = spark.createDataFrame(pd.DataFrame({"a": ["x"]}))
        keys = spark.createDataFrame(pd.DataFrame({"k": ["1"]}))
        with pytest.raises(ValueError):
            ops.project_select(t, ["k", "a"], ["k"], keys)


class TestSparkPairwise:
    def test_subsumption_grouped_by_key(self, spark):
        pdf = pd.DataFrame(
            {"k": ["1", "1", "2"], "a": ["x", None, None], "b": ["y", "y", "q"]}
        )
        out = ops.subsumption(spark.createDataFrame(pdf), ["k"])
        got = {tuple(r) for r in out.select("k", "a", "b").collect()}
        assert got == {("1", "x", "y"), ("2", None, "q")}

    def test_complementation_grouped_by_key(self, spark):
        pdf = pd.DataFrame(
            {"k": ["1", "1", "2"], "a": ["x", None, "w"], "b": [None, "y", None]}
        )
        out = ops.complementation(spark.createDataFrame(pdf), ["k"])
        got = {tuple(r) for r in out.select("k", "a", "b").collect()}
        assert got == {("1", "x", "y"), ("2", "w", None)}

    def test_minimal_form(self, spark):
        pdf = pd.DataFrame(
            {"k": ["1", "1", "1"], "a": ["x", "x", None], "b": [None, None, "y"]}
        )
        out = ops.minimal_form(spark.createDataFrame(pdf), ["k"])
        got = {tuple(r) for r in out.select("k", "a", "b").collect()}
        assert got == {("1", "x", "y")}

    def test_multi_key_grouping(self, spark):
        pdf = pd.DataFrame(
            {
                "k1": ["1", "1"],
                "k2": ["a", "b"],
                "v": ["x", None],
                "w": [None, "y"],
            }
        )
        # different composite keys → no complementation across groups
        out = ops.complementation(spark.createDataFrame(pdf), ["k1", "k2"])
        assert out.count() == 2


class TestAddMissingNullColumns:
    def test_pads_and_orders(self, spark):
        t = spark.createDataFrame(pd.DataFrame({"b": ["x"], "a": ["y"]}))
        out = ops.add_missing_null_columns(t, ["a", "b", "c"])
        assert out.columns == ["a", "b", "c"]
        r = out.collect()[0]
        assert (r["a"], r["b"], r["c"]) == ("y", "x", None)


class TestInnerUnionGroups:
    def test_groups_by_schema(self, spark):
        t1 = spark.createDataFrame(pd.DataFrame({"k": ["1"], "a": ["x"]}))
        t2 = spark.createDataFrame(pd.DataFrame({"a": ["y"], "k": ["2"]}))
        t3 = spark.createDataFrame(pd.DataFrame({"k": ["3"], "b": ["z"]}))
        out = ops.inner_union_groups([t1, t2, t3])
        assert len(out) == 2
        sizes = sorted(d.count() for d in out)
        assert sizes == [1, 2]


# ---------------------------------------------------------------------------
# Theorem 8: ⊎/σ/π/κ/β represent SPJU queries (App. A lemmas)
# ---------------------------------------------------------------------------

@pytest.fixture()
def lemma_tables(spark):
    t1 = spark.createDataFrame(
        pd.DataFrame({"k": ["1", "2", "3"], "a": ["a1", "a2", "a3"]})
    )
    t2 = spark.createDataFrame(
        pd.DataFrame({"k": ["2", "3", "4"], "b": ["b2", "b3", "b4"]})
    )
    return t1, t2


class TestTheorem8:
    def _fd_combine(self, t1, t2, key):
        # β(κ(T1 ⊎ T2)) — combine on shared key values
        u = ops.outer_union(t1, t2)
        return ops.subsumption(ops.complementation(u, [key]), [key])

    def test_lemma12_inner_join(self, spark, lemma_tables):
        t1, t2 = lemma_tables
        via_ops = self._fd_combine(t1, t2, "k").where(
            F.col("a").isNotNull() & F.col("b").isNotNull()
        )
        real = t1.join(t2, on="k", how="inner")
        assert rows(via_ops) == rows(real)

    def test_lemma13_left_join(self, spark, lemma_tables):
        t1, t2 = lemma_tables
        inner = self._fd_combine(t1, t2, "k").where(
            F.col("a").isNotNull() & F.col("b").isNotNull()
        )
        via_ops = ops.subsumption(ops.outer_union(inner, t1), ["k"])
        real = t1.join(t2, on="k", how="left")
        assert rows(via_ops) == rows(real)

    def test_lemma14_full_outer_join(self, spark, lemma_tables):
        t1, t2 = lemma_tables
        inner = self._fd_combine(t1, t2, "k").where(
            F.col("a").isNotNull() & F.col("b").isNotNull()
        )
        left = ops.subsumption(ops.outer_union(inner, t1), ["k"])
        via_ops = ops.subsumption(ops.outer_union(left, t2), ["k"])
        real = t1.join(t2, on="k", how="outer")
        assert rows(via_ops) == rows(real)

    def test_lemma11_inner_union(self, spark):
        t1 = spark.createDataFrame(pd.DataFrame({"k": ["1"], "a": ["x"]}))
        t2 = spark.createDataFrame(pd.DataFrame({"k": ["2"], "a": ["y"]}))
        assert rows(ops.outer_union(t1, t2)) == rows(t1.unionByName(t2))

    def test_lemma15_cross_product(self, spark):
        t1 = spark.createDataFrame(pd.DataFrame({"a": ["a1", "a2"]}))
        t2 = spark.createDataFrame(pd.DataFrame({"b": ["b1", "b2"]}))
        # κ over a constant shared column makes disjoint-schema rows
        # complement each other. The paper's κ *replaces* a complementing
        # pair with its merge, so the full m×n product only falls out of
        # the proof's iterated pairwise composition — we verify that unit:
        # 1 row × 1 row through ⊎ then κ equals the cross product.
        one1 = spark.createDataFrame(pd.DataFrame({"a": ["a1"], "c": ["const"]}))
        one2 = spark.createDataFrame(pd.DataFrame({"b": ["b1"], "c": ["const"]}))
        via_ops = ops.complement_pdf(ops.outer_union(one1, one2).toPandas())
        real = (
            t1.limit(1).crossJoin(t2.limit(1)).withColumn("c", F.lit("const")).toPandas()
        )
        assert via_ops[["a", "b", "c"]].values.tolist() == real[
            ["a", "b", "c"]
        ].values.tolist()
