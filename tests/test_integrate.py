"""Table Integration (Alg 2): labelling, minimal forms, the full loop."""
import pandas as pd
import pytest

from repro.core import integrate as integ
from repro.core import metrics_core as mc
from repro.lake.repository import to_spark

KEY = ["ID"]


class TestLabelSourceNulls:
    def test_nulls_become_labels(self, fig3_source):
        lab = integ.label_source_nulls(fig3_source, KEY)
        v = lab.loc[0, "Gender"]
        assert isinstance(v, str) and v.startswith(integ.LABEL_PREFIX)
        # non-null values untouched
        assert lab.loc[1, "Gender"] == "Male"

    def test_labels_unique_per_position(self):
        src = pd.DataFrame({"ID": ["0", "1"], "a": [None, None], "b": [None, "x"]})
        lab = integ.label_source_nulls(src, KEY)
        labels = {lab.loc[0, "a"], lab.loc[1, "a"], lab.loc[0, "b"]}
        assert len(labels) == 3

    def test_key_never_labeled(self):
        src = pd.DataFrame({"ID": ["0"], "a": [None]})
        lab = integ.label_source_nulls(src, KEY)
        assert lab.loc[0, "ID"] == "0"


class TestApplyRemoveLabels:
    def test_roundtrip(self, spark, fig3_source, fig3_tables):
        lab = integ.label_source_nulls(fig3_source, KEY)
        a = to_spark(spark, fig3_tables["A"])
        # give A a Gender column with a null where S is null (Smith)
        from pyspark.sql import functions as F

        a = a.withColumn("Gender", F.lit(None).cast("string"))
        labeled = integ.apply_null_labels(spark, a, lab, KEY)
        smith = labeled.where(F.col("ID") == "0").collect()[0]
        assert smith["Gender"].startswith(integ.LABEL_PREFIX)
        # Brown's Gender is non-null in S, so his table-null stays null
        brown = labeled.where(F.col("ID") == "1").collect()[0]
        assert brown["Gender"] is None
        # and removal restores nulls
        restored = integ.remove_labeled_nulls(labeled)
        assert restored.where(F.col("ID") == "0").collect()[0]["Gender"] is None


class TestIntegrate:
    def test_perfect_reclamation_from_complementary_tables(self, spark, fig3_source, fig3_tables):
        ids = {"Smith": "0", "Brown": "1", "Wang": "2"}
        d = fig3_tables["D"].copy()
        d.insert(0, "ID", d["Name"].map(ids))
        tables = [to_spark(spark, fig3_tables["A"]), to_spark(spark, d)]
        out = integ.integrate(spark, tables, fig3_source, KEY).toPandas()
        assert mc.is_perfect(fig3_source, out)

    def test_erroneous_table_does_not_corrupt_source_tuples(
        self, spark, fig3_source, fig3_tables
    ):
        ids = {"Smith": "0", "Brown": "1", "Wang": "2"}
        c = fig3_tables["C"].copy()  # all-Male Gender, partly wrong
        c.insert(0, "ID", c["Name"].map(ids))
        d = fig3_tables["D"].copy()
        d.insert(0, "ID", d["Name"].map(ids))
        tables = [to_spark(spark, fig3_tables["A"]), to_spark(spark, d), to_spark(spark, c)]
        out = integ.integrate(spark, tables, fig3_source, KEY).toPandas()
        rec, pre = mc.recall_precision(fig3_source, out)
        # every source tuple is still reclaimed; C's contradictions may add
        # extra tuples but must not overwrite correct ones
        assert rec == 1.0
        assert mc.eis(fig3_source, out, KEY) >= 0.9

    def test_missing_column_padded(self, spark, fig3_source, fig3_tables):
        out = integ.integrate(
            spark, [to_spark(spark, fig3_tables["A"])], fig3_source, KEY
        )
        assert out.columns == list(fig3_source.columns)

    def test_select_drops_foreign_keys(self, spark, fig3_source, fig3_tables):
        a = fig3_tables["A"].copy()
        a.loc[len(a)] = ["99", "Stranger", "PhD"]
        out = integ.integrate(spark, [to_spark(spark, a)], fig3_source, KEY).toPandas()
        assert "99" not in set(out["ID"])

    def test_empty_input(self, spark, fig3_source):
        assert integ.integrate(spark, [], fig3_source, KEY) is None

    def test_table_without_key_skipped(self, spark, fig3_source, fig3_tables):
        b = to_spark(spark, fig3_tables["B"])  # no ID column
        assert integ.integrate(spark, [b], fig3_source, KEY) is None

    def test_no_labeled_values_leak(self, spark, fig3_source, fig3_tables):
        ids = {"Smith": "0", "Brown": "1", "Wang": "2"}
        d = fig3_tables["D"].copy()
        d.insert(0, "ID", d["Name"].map(ids))
        out = integ.integrate(
            spark, [to_spark(spark, fig3_tables["A"]), to_spark(spark, d)], fig3_source, KEY
        ).toPandas()
        for c in out.columns:
            assert not out[c].astype(str).str.startswith(integ.LABEL_PREFIX).any()


class TestGenTEndToEnd:
    def test_fig3_full_pipeline(self, spark, fig3_repo, fig3_source):
        from repro.core.gent import reclaim

        res = reclaim(spark, fig3_repo, fig3_source, KEY, tau=0.3)
        assert res.reclaimed is not None
        out = res.reclaimed.toPandas()
        rec, pre = mc.recall_precision(fig3_source, out)
        assert rec == 1.0
        assert pre == 1.0
        # Table C's misleading Gender column must have been pruned
        assert not any(n.startswith("C") for n in res.originating)

    def test_timings_recorded(self, spark, fig3_repo, fig3_source):
        from repro.core.gent import reclaim

        res = reclaim(spark, fig3_repo, fig3_source, KEY, tau=0.3, coarse_k=5)
        assert {"set_similarity", "total"} <= set(res.timings)
        assert res.timings["total"] > 0
