"""Unit tests for Eq 12–13 evaluation measures (pure python)."""
import pytest

from repro.eval.metrics import (
    evaluate_all,
    ideal_recall_at_k,
    map_at_k,
    precision_at_k,
    recall_at_k,
)

REL = {"a", "b", "c", "d"}


class TestPrecisionAtK:
    def test_all_correct(self):
        assert precision_at_k(["a", "b"], REL, 2) == 1.0

    def test_half_correct(self):
        assert precision_at_k(["a", "x"], REL, 2) == 0.5

    def test_none_correct(self):
        assert precision_at_k(["x", "y"], REL, 2) == 0.0

    def test_empty_ranked(self):
        assert precision_at_k([], REL, 5) == 0.0

    def test_paper_example(self):
        """Sec 8.1: k=10, method returns 2 results, 1 correct -> P@10 = 1/10."""
        relevant = {f"g{i}" for i in range(20)}
        ranked = ["g0", "bad"]
        assert precision_at_k(ranked, relevant, 10) == pytest.approx(0.1)

    def test_missing_results_count_wrong(self):
        # 3 returned, all correct, but k=10 -> 3/10.
        assert precision_at_k(["a", "b", "c"], REL, 10) == pytest.approx(0.3)

    def test_k_zero(self):
        assert precision_at_k(["a"], REL, 0) == 0.0

    def test_truncates_to_k(self):
        # Only the first k entries count.
        assert precision_at_k(["x", "a", "b"], REL, 1) == 0.0

    @pytest.mark.parametrize("k", [1, 2, 3, 4, 5, 8])
    def test_perfect_prefix(self, k):
        ranked = ["a", "b", "c", "d"]
        assert precision_at_k(ranked, REL, k) == pytest.approx(min(k, 4) / k)


class TestRecallAtK:
    def test_paper_example(self):
        """Sec 8.1: ground truth 20, 1 correct returned -> R = 1/20."""
        relevant = {f"g{i}" for i in range(20)}
        assert recall_at_k(["g0", "bad"], relevant, 10) == pytest.approx(1 / 20)

    def test_bounded_by_k_over_gt(self):
        relevant = {f"g{i}" for i in range(40)}
        ranked = [f"g{i}" for i in range(40)]
        assert recall_at_k(ranked, relevant, 10) == pytest.approx(10 / 40)

    def test_empty_relevant(self):
        assert recall_at_k(["a"], set(), 5) == 0.0

    def test_full_recall(self):
        assert recall_at_k(["a", "b", "c", "d"], REL, 4) == 1.0

    @pytest.mark.parametrize("n_hits", [0, 1, 2, 3, 4])
    def test_linear_in_hits(self, n_hits):
        ranked = list(sorted(REL))[:n_hits] + ["x"] * (4 - n_hits)
        assert recall_at_k(ranked, REL, 4) == pytest.approx(n_hits / 4)


class TestMapAtK:
    def test_perfect(self):
        assert map_at_k(["a", "b", "c"], REL, 3) == 1.0

    def test_single_wrong_at_top_hurts_most(self):
        early_bad = map_at_k(["x", "a", "b"], REL, 3)
        late_bad = map_at_k(["a", "b", "x"], REL, 3)
        assert late_bad > early_bad

    def test_running_precision_definition(self):
        # ranked = [a, x]: P@1 = 1, P@2 = 1/2 -> MAP@2 = 3/4.
        assert map_at_k(["a", "x"], REL, 2) == pytest.approx(0.75)

    def test_empty(self):
        assert map_at_k([], REL, 4) == 0.0

    def test_k_zero(self):
        assert map_at_k(["a"], REL, 0) == 0.0

    def test_missing_tail_counts(self):
        # Only 1 result for k=2: P@1=1, P@2=0.5 -> 0.75 (same as wrong tail).
        assert map_at_k(["a"], REL, 2) == pytest.approx(0.75)

    def test_map_at_least_final_precision(self):
        ranked = ["a", "x", "b", "y"]
        assert map_at_k(ranked, REL, 4) >= precision_at_k(ranked, REL, 4)


class TestEvaluateAll:
    def test_averages_over_queries(self):
        gt = {"q1": {"a"}, "q2": {"b"}}
        results = {"q1": ["a"], "q2": ["x"]}
        m = evaluate_all(results, gt, 1)
        assert m["P"] == pytest.approx(0.5)
        assert m["R"] == pytest.approx(0.5)
        assert m["MAP"] == pytest.approx(0.5)

    def test_missing_query_scores_zero(self):
        gt = {"q1": {"a"}, "q2": {"b"}}
        m = evaluate_all({"q1": ["a"]}, gt, 1)
        assert m["P"] == pytest.approx(0.5)

    def test_empty_gt(self):
        assert evaluate_all({}, {}, 5) == {"P": 0.0, "R": 0.0, "MAP": 0.0}

    def test_extra_results_ignored(self):
        gt = {"q1": {"a"}}
        m = evaluate_all({"q1": ["a"], "junk": ["b"]}, gt, 1)
        assert m["P"] == 1.0


class TestIdealRecall:
    def test_gt_smaller_than_k(self):
        assert ideal_recall_at_k({"q": {"a", "b"}}, 5) == 1.0

    def test_gt_larger_than_k(self):
        gt = {"q": {f"g{i}" for i in range(30)}}
        assert ideal_recall_at_k(gt, 10) == pytest.approx(10 / 30)

    def test_mixed(self):
        gt = {"q1": {"a"}, "q2": {f"g{i}" for i in range(20)}}
        assert ideal_recall_at_k(gt, 10) == pytest.approx((1.0 + 0.5) / 2)

    def test_empty(self):
        assert ideal_recall_at_k({}, 10) == 0.0
