"""Set Similarity (Alg 3) and Diversify (Alg 4) over the Fig-3 lake."""
import pandas as pd
import pytest

from repro.core import discovery as disc

KEY = ["ID"]
TAU = 0.3


@pytest.fixture(scope="module")
def candidates(spark, fig3_repo, fig3_source):
    return disc.set_similarity(
        spark, fig3_repo, fig3_source, KEY, tau=TAU, k_per_col=10
    )


class TestSetSimilarity:
    def test_junk_not_retrieved(self, candidates):
        assert "junk" not in {c.name for c in candidates}

    def test_relevant_tables_found(self, candidates):
        names = {c.name for c in candidates}
        assert "A" in names
        # D and its duplicate E carry the same info: at most one survives
        assert len(names & {"D", "E"}) == 1

    def test_subsumed_candidate_removed(self, candidates):
        # B's columns (Name, Age) and values are contained in D's
        assert "B" not in {c.name for c in candidates}

    def test_schema_matching_renames(self, candidates):
        a = next(c for c in candidates if c.name == "A")
        assert set(a.mapping) == {"ID", "Name", "Education Level"}
        # the renamed DataFrame exposes source column names
        assert {"ID", "Name", "Education Level"} <= set(a.df.columns)

    def test_mapping_points_at_anonymized_cols(self, candidates):
        a = next(c for c in candidates if c.name == "A")
        assert a.mapping["ID"] == "c0"
        assert a.mapping["Name"] == "c1"

    def test_overlap_scores_bounded(self, candidates):
        for c in candidates:
            for s, ov in c.col_overlaps.items():
                assert 0 <= ov <= 1

    def test_tau_filters(self, spark, fig3_repo, fig3_source):
        none = disc.set_similarity(
            spark, fig3_repo, fig3_source, KEY, tau=1.01
        )
        assert none == []

    def test_restrict_to(self, spark, fig3_repo, fig3_source):
        only_a = disc.set_similarity(
            spark, fig3_repo, fig3_source, KEY, tau=TAU, restrict_to=["A"]
        )
        assert {c.name for c in only_a} == {"A"}


class TestDiversify:
    def test_duplicate_penalized(self):
        vals = frozenset({"x", "y", "z"})
        ranked = [
            {"table": "D", "overlap": 1.0, "vals": vals},
            {"table": "E", "overlap": 1.0, "vals": vals},  # exact duplicate
            {"table": "A", "overlap": 0.8, "vals": frozenset({"q", "r"})},
        ]
        out = disc.diversify_candidates(ranked)
        order = [d["table"] for d in out]
        # Example 9: the duplicate drops below the diverse table A
        assert order.index("A") < order.index("E")
        assert order[0] == "D"

    def test_first_keeps_raw_overlap(self):
        out = disc.diversify_candidates(
            [{"table": "T", "overlap": 0.7, "vals": frozenset({"a"})}]
        )
        assert out[0]["div_score"] == pytest.approx(0.7)

    def test_empty(self):
        assert disc.diversify_candidates([]) == []


class TestCoarseRetrieve:
    def test_ranks_by_shared_mass(self, spark, fig3_repo, fig3_source):
        top = disc.coarse_retrieve(spark, fig3_repo, fig3_source, top_k=3)
        assert "junk" not in top
        assert len(top) == 3

    def test_top_k_limit(self, spark, fig3_repo, fig3_source):
        assert len(disc.coarse_retrieve(spark, fig3_repo, fig3_source, top_k=1)) == 1


class TestSourceValueDf:
    def test_melt(self, spark, fig3_source):
        df = disc.source_value_df(spark, fig3_source).toPandas()
        assert set(df.columns) == {"src_col", "value"}
        assert ("Name", "Smith") in set(map(tuple, df.values))
        # nulls are not emitted
        assert not df["value"].isna().any()
