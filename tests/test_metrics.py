"""Evaluation metric tests (P/R@k, R-precision, Relative Recall)."""
import pytest

from repro.eval.metrics import (macro_pr_at_k, macro_r_precision,
                                precision_recall_at_k, precision_recall_sets,
                                r_precision, relative_recall)


class TestPrecisionRecallAtK:
    def test_perfect(self):
        p, r = precision_recall_at_k(["a", "b"], {"a", "b"}, 2)
        assert (p, r) == (1.0, 1.0)

    def test_half(self):
        p, r = precision_recall_at_k(["a", "x"], {"a", "b"}, 2)
        assert (p, r) == (0.5, 0.5)

    def test_k_larger_than_result(self):
        p, r = precision_recall_at_k(["a"], {"a", "b"}, 4)
        assert p == 0.25 and r == 0.5

    def test_empty_truth(self):
        assert precision_recall_at_k(["a"], set(), 1) == (0.0, 0.0)

    def test_recall_monotone_in_k(self):
        ranked = ["x", "a", "y", "b"]
        truth = {"a", "b"}
        recalls = [precision_recall_at_k(ranked, truth, k)[1] for k in (1, 2, 3, 4)]
        assert recalls == sorted(recalls)


class TestRPrecision:
    def test_equals_precision_at_truth_size(self):
        ranked = ["a", "x", "b"]
        truth = {"a", "b", "c"}
        assert r_precision(ranked, truth) == pytest.approx(2 / 3)

    def test_empty(self):
        assert r_precision(["a"], set()) == 0.0

    def test_macro(self):
        results = {"q1": ["a"], "q2": ["x"]}
        truths = {"q1": {"a"}, "q2": {"b"}}
        assert macro_r_precision(results, truths) == 0.5

    def test_macro_skips_empty_truths(self):
        results = {"q1": ["a"], "q2": ["x"]}
        truths = {"q1": {"a"}, "q2": set()}
        assert macro_r_precision(results, truths) == 1.0


class TestMacroPR:
    def test_basic(self):
        results = {"q1": ["a", "b"], "q2": ["c", "x"]}
        truths = {"q1": {"a", "b"}, "q2": {"c", "d"}}
        p, r = macro_pr_at_k(results, truths, 2)
        assert p == 0.75 and r == 0.75

    def test_missing_query(self):
        p, r = macro_pr_at_k({}, {"q": {"a"}}, 1)
        assert (p, r) == (0.0, 0.0)


class TestSets:
    def test_precision_recall_sets(self):
        p, r = precision_recall_sets({"a", "b", "x"}, {"a", "b", "c"})
        assert p == pytest.approx(2 / 3)
        assert r == pytest.approx(2 / 3)

    def test_empty_found(self):
        assert precision_recall_sets(set(), {"a"}) == (0.0, 0.0)


class TestRelativeRecall:
    def test_definition(self):
        found = {"m1": {1, 2, 3}, "m2": {3, 4}}
        rr = relative_recall(found)
        assert rr["m1"] == 0.75 and rr["m2"] == 0.5

    def test_with_reference(self):
        rr = relative_recall({"m": {1}}, reference={1, 2, 3, 4})
        assert rr["m"] == 0.25

    def test_empty_union(self):
        assert relative_recall({"m": set()}) == {"m": 0.0}

    def test_best_measure_bounded_by_one(self):
        rr = relative_recall({"m": {1, 2}, "n": {1}})
        assert max(rr.values()) == 1.0
