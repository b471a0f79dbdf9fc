"""Metric definitions, locked to the paper's worked Example 6 numbers."""
import math

import pandas as pd
import pytest

from repro.core import metrics_core as mc

KEY = ["ID"]


class TestExample6:
    """Exact values stated in the paper for Fig 3 / Fig 4."""

    def test_instance_similarity_s1(self, fig3_source, fig3_s1hat):
        assert mc.instance_similarity(fig3_source, fig3_s1hat, KEY) == pytest.approx(
            (3 / 4 + 4 / 4 + 3 / 4) / 3
        )

    def test_instance_similarity_s2(self, fig3_source, fig3_s2hat):
        assert mc.instance_similarity(fig3_source, fig3_s2hat, KEY) == pytest.approx(0.75)

    def test_eis_s1(self, fig3_source, fig3_s1hat):
        assert mc.eis(fig3_source, fig3_s1hat, KEY) == pytest.approx(0.875)

    def test_eis_s2(self, fig3_source, fig3_s2hat):
        assert mc.eis(fig3_source, fig3_s2hat, KEY) == pytest.approx(0.9166, abs=1e-3)

    def test_eis_prefers_nulls_over_errors(self, fig3_source, fig3_s1hat, fig3_s2hat):
        # The whole point of EIS (Example 6): Ŝ2 beats Ŝ1 despite lower
        # plain instance similarity.
        assert mc.eis(fig3_source, fig3_s2hat, KEY) > mc.eis(fig3_source, fig3_s1hat, KEY)
        assert mc.instance_similarity(
            fig3_source, fig3_s1hat, KEY
        ) > mc.instance_similarity(fig3_source, fig3_s2hat, KEY)

    def test_instance_divergence(self, fig3_source, fig3_s1hat):
        assert mc.instance_divergence(fig3_source, fig3_s1hat, KEY) == pytest.approx(
            1 - 0.8333, abs=1e-3
        )


class TestTupleSimilarity:
    NK = [1, 2, 3, 4]  # non-key indices for 5-col rows

    def test_identical(self):
        s = ("0", "a", "b", "c", "d")
        assert mc.error_aware_tuple_similarity(s, s, self.NK) == 1.0
        assert mc.tuple_similarity(s, s, self.NK) == 1.0

    def test_all_null_target(self):
        s = ("0", "a", "b", "c", "d")
        t = ("0", None, None, None, None)
        assert mc.error_aware_tuple_similarity(s, t, self.NK) == 0.0
        assert mc.tuple_similarity(s, t, self.NK) == 0.0

    def test_erroneous_penalized(self):
        s = ("0", "a", "b", "c", "d")
        t = ("0", "a", "b", "c", "WRONG")
        assert mc.error_aware_tuple_similarity(s, t, self.NK) == pytest.approx((3 - 1) / 4)
        assert mc.tuple_similarity(s, t, self.NK) == pytest.approx(3 / 4)

    def test_error_on_source_null_penalized(self):
        s = ("0", "a", None, "c", "d")
        t = ("0", "a", "X", "c", "d")
        # α=3, δ=1 (non-null where S is null counts as erroneous)
        assert mc.error_aware_tuple_similarity(s, t, self.NK) == pytest.approx(2 / 4)

    def test_both_null_counts_as_agreement_in_eis_only(self):
        s = ("0", "a", None, "c", "d")
        t = ("0", "a", None, "c", "d")
        assert mc.error_aware_tuple_similarity(s, t, self.NK) == 1.0
        assert mc.tuple_similarity(s, t, self.NK) == pytest.approx(3 / 4)

    def test_can_be_negative(self):
        s = ("0", "a", "b", "c", "d")
        t = ("0", "w", "x", "y", "z")
        assert mc.error_aware_tuple_similarity(s, t, self.NK) == -1.0


class TestRecallPrecision:
    def test_perfect(self, fig3_source):
        rec, pre = mc.recall_precision(fig3_source, fig3_source.copy())
        assert rec == 1.0 and pre == 1.0
        assert mc.is_perfect(fig3_source, fig3_source.copy())

    def test_empty_reclaimed(self, fig3_source):
        empty = fig3_source.iloc[0:0]
        rec, pre = mc.recall_precision(fig3_source, empty)
        assert rec == 0.0 and pre == 0.0

    def test_superset_hurts_precision_only(self, fig3_source):
        extra = fig3_source.copy()
        extra.loc[len(extra)] = ["9", "Zed", "99", "Male", "PhD"]
        rec, pre = mc.recall_precision(fig3_source, extra)
        assert rec == 1.0
        assert pre == pytest.approx(3 / 4)

    def test_null_safe_tuple_equality(self):
        s = pd.DataFrame({"k": ["0"], "v": [None]})
        r = pd.DataFrame({"k": ["0"], "v": [None]})
        assert mc.recall_precision(s, r) == (1.0, 1.0)

    def test_distinct_semantics(self, fig3_source):
        doubled = pd.concat([fig3_source, fig3_source], ignore_index=True)
        rec, pre = mc.recall_precision(fig3_source, doubled)
        assert rec == 1.0 and pre == 1.0

    def test_fig3_fd_result(self, fig3_source, fig3_s1hat):
        # Ŝ1 reclaims only the Brown tuple exactly (Smith got an erroneous
        # Gender, Wang split into two partial tuples).
        rec, pre = mc.recall_precision(fig3_source, fig3_s1hat)
        assert rec == pytest.approx(1 / 3)
        assert pre == pytest.approx(1 / 4)


class TestConditionalKL:
    def test_perfect_is_zero(self, fig3_source):
        assert mc.conditional_kl(fig3_source, fig3_source.copy(), KEY) == pytest.approx(0.0)

    def test_empty_is_max_penalty(self, fig3_source):
        empty = fig3_source.iloc[0:0]
        d = mc.conditional_kl(fig3_source, empty, KEY)
        # per column: 3 keys × −log(eps); divided by eps-floored Q(K)
        assert d == pytest.approx(3 * -math.log(mc.KL_EPS) / mc.KL_EPS)

    def test_error_worse_than_null(self):
        s = pd.DataFrame({"k": ["0", "1"], "v": ["a", "b"]})
        nulled = pd.DataFrame({"k": ["0", "1"], "v": ["a", None]})
        wrong = pd.DataFrame({"k": ["0", "1"], "v": ["a", "ERR"]})
        d_null = mc.conditional_kl(s, nulled, ["k"])
        d_wrong = mc.conditional_kl(s, wrong, ["k"])
        assert 0 < d_null <= d_wrong

    def test_foreign_keys_divide_score(self, fig3_source):
        # Extra non-source keys shrink Q(K) and inflate D_KL (why ALITE's
        # unselected outputs score ~36 in Table II). Both reclaimed tables
        # share one nullified value so the numerator is identical and only
        # Q(K) differs.
        imperfect = fig3_source.copy()
        imperfect.loc[0, "Age"] = None
        noisy = pd.concat(
            [
                imperfect,
                pd.DataFrame(
                    {
                        "ID": [str(i) for i in range(10, 40)],
                        "Name": ["x"] * 30,
                        "Age": ["0"] * 30,
                        "Gender": ["z"] * 30,
                        "Education Level": ["w"] * 30,
                    }
                ),
            ],
            ignore_index=True,
        )
        d_tight = mc.conditional_kl(fig3_source, imperfect, KEY)
        d_noisy = mc.conditional_kl(fig3_source, noisy, KEY)
        assert 0 < d_tight < d_noisy

    def test_s1_worse_than_s2(self, fig3_source, fig3_s1hat, fig3_s2hat):
        # Ŝ1 contains an erroneous Gender for Smith; Ŝ2 only nulls.
        assert mc.conditional_kl(fig3_source, fig3_s1hat, KEY) > mc.conditional_kl(
            fig3_source, fig3_s2hat, KEY
        )


class TestEisEdgeCases:
    def test_empty_source(self):
        e = pd.DataFrame(columns=["k", "v"])
        assert mc.eis(e, e, ["k"]) == 0.0

    def test_missing_tuple_contributes_zero(self):
        s = pd.DataFrame({"k": ["0", "1"], "v": ["a", "b"]})
        half = pd.DataFrame({"k": ["0"], "v": ["a"]})
        assert mc.eis(s, half, ["k"]) == pytest.approx(0.5)

    def test_all_null_aligned_is_half(self):
        s = pd.DataFrame({"k": ["0"], "v": ["a"]})
        t = pd.DataFrame({"k": ["0"], "v": [None]})
        assert mc.eis(s, t, ["k"]) == pytest.approx(0.5)

    def test_multi_attr_key(self):
        s = pd.DataFrame({"k1": ["0", "0"], "k2": ["a", "b"], "v": ["x", "y"]})
        t = pd.DataFrame({"k1": ["0", "0"], "k2": ["a", "b"], "v": ["x", None]})
        assert mc.eis(s, t, ["k1", "k2"]) == pytest.approx((1.0 + 0.5) / 2)

    def test_best_aligned_tuple_wins(self):
        s = pd.DataFrame({"k": ["0"], "a": ["1"], "b": ["2"]})
        t = pd.DataFrame({"k": ["0", "0"], "a": ["1", "ERR"], "b": [None, "ERR"]})
        # best row: α=1, δ=0 → 0.5·(1+0.5) = 0.75
        assert mc.eis(s, t, ["k"]) == pytest.approx(0.75)
