"""Parquet repository: canonicalization, round-trips, cells dataset."""
import numpy as np
import pandas as pd
import pytest

from repro.lake.repository import (
    RepositoryBuilder,
    TableRepository,
    canon_str,
    to_spark,
)


class TestCanonStr:
    def test_ints(self):
        out = canon_str(pd.DataFrame({"a": [1, 2]}))
        assert out["a"].tolist() == ["1", "2"]

    def test_integral_floats_lose_point(self):
        out = canon_str(pd.DataFrame({"a": [1.0, 2.5]}))
        assert out["a"].tolist() == ["1", "2.5"]

    def test_nan_to_none(self):
        out = canon_str(pd.DataFrame({"a": [1.0, np.nan]}))
        assert out["a"].tolist() == ["1", None]

    def test_dates_iso(self):
        out = canon_str(pd.DataFrame({"a": pd.to_datetime(["1992-01-03"])}))
        assert out["a"].tolist() == ["1992-01-03"]

    def test_strings_passthrough(self):
        out = canon_str(pd.DataFrame({"a": ["x", None]}))
        assert out["a"].tolist() == ["x", None]

    def test_same_value_same_string_across_dtypes(self):
        # the property discovery relies on: typed 42 and float 42.0 meet
        a = canon_str(pd.DataFrame({"v": [42]}))["v"][0]
        b = canon_str(pd.DataFrame({"v": [42.0]}))["v"][0]
        assert a == b == "42"

    def test_column_order_preserved(self):
        out = canon_str(pd.DataFrame({"b": [1], "a": [2]}))
        assert list(out.columns) == ["b", "a"]


class TestRepository:
    @pytest.fixture()
    def repo(self, tmp_path):
        b = RepositoryBuilder(tmp_path / "lake")
        b.add("t1", pd.DataFrame({"k": [1, 2], "v": ["x", None]}), meta={"kind": "demo"})
        b.add("t2", pd.DataFrame({"a": [1.5], "b": ["y"]}))
        return b.finish()

    def test_manifest(self, repo):
        assert repo.names() == ["t1", "t2"]
        assert repo.columns("t1") == ["k", "v"]
        assert repo.rows("t1") == 2
        assert repo.meta("t1") == {"kind": "demo"}

    def test_duplicate_name_rejected(self, tmp_path):
        b = RepositoryBuilder(tmp_path / "lake2")
        b.add("t", pd.DataFrame({"a": [1]}))
        with pytest.raises(ValueError):
            b.add("t", pd.DataFrame({"a": [2]}))

    def test_pandas_roundtrip_nulls(self, repo):
        pdf = repo.load_pdf("t1")
        assert pdf["v"].tolist() == ["x", None]
        assert pdf["k"].tolist() == ["1", "2"]

    def test_spark_roundtrip(self, spark, repo):
        df = repo.load(spark, "t1")
        assert df.columns == ["k", "v"]
        assert {tuple(r) for r in df.collect()} == {("1", "x"), ("2", None)}
        assert all(f.dataType.typeName() == "string" for f in df.schema.fields)

    def test_cells_distinct_nonnull(self, spark, repo):
        cells = repo.cells(spark).toPandas()
        t1 = cells[cells["table"] == "t1"]
        assert set(map(tuple, t1[["col", "value"]].values)) == {
            ("k", "1"),
            ("k", "2"),
            ("v", "x"),  # null cell not emitted
        }

    def test_cells_cover_all_tables(self, spark, repo):
        cells = repo.cells(spark)
        assert {r["table"] for r in cells.select("table").distinct().collect()} == {
            "t1",
            "t2",
        }

    def test_stats(self, repo):
        s = repo.stats()
        assert s["tables"] == 2
        assert s["cols"] == 4
        assert s["avg_rows"] == pytest.approx(1.5)
        assert s["size_mb"] > 0

    def test_reopen(self, repo):
        re = TableRepository(repo.root)
        assert re.names() == repo.names()


class TestToSpark:
    def test_all_null_column(self, spark):
        df = to_spark(spark, pd.DataFrame({"a": ["x"], "b": [None]}))
        r = df.collect()[0]
        assert (r["a"], r["b"]) == ("x", None)

    def test_empty_frame(self, spark):
        df = to_spark(spark, pd.DataFrame(columns=["a", "b"]))
        assert df.count() == 0
        assert df.columns == ["a", "b"]
