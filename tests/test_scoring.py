"""Unit tests for the Sec 6 scoring functions and the tree matcher
(pure-python reference implementation)."""
import pytest

from repro.core.scoring import (
    QueryTree,
    build_query_tree,
    col_match,
    greedy_bipartite_sum,
    inter_method_pair_match,
    match_tree,
    pair_match_method,
    rank_tiebreak,
    rel_match,
)


class TestColMatch:
    def test_basic_max(self):
        q = {"city": 0.6, "place": 1.0}
        t = {"city": 0.22 * 0.6, "place": 0.14 * 1.0}
        s, a = col_match(q, t)
        # city: 0.6 * 0.132 = 0.0792 > place: 1.0 * 0.14 = 0.14? No: 0.14 wins.
        assert a == "place"
        assert s == pytest.approx(0.14)

    def test_no_intersection(self):
        assert col_match({"a": 1.0}, {"b": 1.0}) == (0.0, None)

    def test_empty(self):
        assert col_match({}, {"a": 1.0}) == (0.0, None)

    def test_single(self):
        s, a = col_match({"x": 0.5}, {"x": 0.4})
        assert (s, a) == (pytest.approx(0.2), "x")

    def test_deterministic_tie(self):
        s, a = col_match({"a": 0.5, "b": 0.5}, {"a": 0.5, "b": 0.5})
        assert a == "a"  # sorted order

    @pytest.mark.parametrize("scale", [0.1, 0.5, 1.0])
    def test_scale_monotone(self, scale):
        s, _ = col_match({"x": scale}, {"x": 0.5})
        assert s == pytest.approx(0.5 * scale)


class TestRelMatch:
    def test_same_as_colmatch_semantics(self):
        q = {"locatedIn": 0.9}
        t = {"locatedIn": 0.8, "ledBy": 1.0}
        s, p = rel_match(q, t)
        assert p == "locatedIn"
        assert s == pytest.approx(0.72)


class TestPairMatch:
    def test_product_of_three(self):
        s, a1, a2 = pair_match_method(
            {"park": 1.0}, {"locatedIn": 1.0}, {"city": 0.6},
            {"park": 0.5}, {"locatedIn": 0.9}, {"city": 0.4},
        )
        assert s == pytest.approx(1.0 * 0.5 * 0.9 * 0.6 * 0.4)
        assert (a1, a2) == ("park", "city")

    def test_zero_if_any_factor_missing(self):
        s, _, _ = pair_match_method(
            {"park": 1.0}, {}, {"city": 1.0},
            {"park": 1.0}, {"locatedIn": 1.0}, {"city": 1.0},
        )
        assert s == 0.0


class TestInterMethod:
    def test_example_18(self):
        """Example 18: max(0.48*0.893, 0.166*0.552) -> the KB branch wins.

        In Eq 10's formulation the KB side is compared after removing the
        granularity bias; we reproduce the example's selection: the
        KB-side pairMatch 0.48*0.893 beats the synthesized 0.166*0.552.
        """
        pm_kb = 0.48 * 0.893
        pm_synth = 0.166 * 0.552
        # gs values such that unbiased comparison still prefers KB.
        s, method = inter_method_pair_match(pm_kb, 0.9, 0.9, pm_synth)
        assert method == "kb"
        assert s == pytest.approx(pm_kb)

    def test_synth_wins_when_kb_absent(self):
        s, method = inter_method_pair_match(0.0, 1.0, 1.0, 0.3)
        assert (s, method) == (0.3, "synth")

    def test_kb_kept_with_gs_bias_included(self):
        # unbiased KB = 0.5 / (0.2*0.2) = 12.5 >= 0.9 -> KB branch,
        # but the returned score keeps the gs factors (0.5).
        s, method = inter_method_pair_match(0.5, 0.2, 0.2, 0.9)
        assert method == "kb"
        assert s == pytest.approx(0.5)

    def test_tie_prefers_kb(self):
        s, method = inter_method_pair_match(0.4, 1.0, 1.0, 0.4)
        assert method == "kb"

    def test_zero_gs_falls_back_to_synth(self):
        s, method = inter_method_pair_match(0.4, 0.0, 1.0, 0.1)
        assert method == "synth"


class TestBuildQueryTree:
    def test_star(self):
        t = build_query_tree(0, {(0, 1), (0, 2)})
        assert t.root == 0
        assert set(t.edges) == {(0, 1), (0, 2)}

    def test_two_levels(self):
        t = build_query_tree(0, {(0, 1), (1, 2)})
        assert set(t.edges) == {(0, 1), (1, 2)}

    def test_depth_limit(self):
        t = build_query_tree(0, {(0, 1), (1, 2), (2, 3)})
        assert (2, 3) not in t.edges  # depth 3 pruned

    def test_orientation_agnostic(self):
        t = build_query_tree(0, {(1, 0)})
        assert t.edges == ((0, 1),)

    def test_disconnected_edge_ignored(self):
        t = build_query_tree(0, {(5, 6)})
        assert t.edges == ()

    def test_no_self_loop(self):
        t = build_query_tree(0, {(0, 0)})
        assert t.edges == ()

    def test_children(self):
        t = QueryTree(root=0, edges=((0, 1), (0, 2), (1, 3)))
        assert t.children(0) == [1, 2]
        assert t.children(1) == [3]


class TestMatchTree:
    def test_single_edge(self):
        t = QueryTree(root=0, edges=((0, 1),))
        scores = {(0, 1, 10, 11): 0.5}
        assert match_tree(t, scores) == pytest.approx(0.5)

    def test_sums_over_edges(self):
        t = QueryTree(root=0, edges=((0, 1), (0, 2)))
        scores = {(0, 1, 10, 11): 0.5, (0, 2, 10, 12): 0.25}
        assert match_tree(t, scores) == pytest.approx(0.75)

    def test_consistent_root(self):
        # Two edges matched via *different* roots cannot both count.
        t = QueryTree(root=0, edges=((0, 1), (0, 2)))
        scores = {(0, 1, 10, 11): 0.5, (0, 2, 20, 12): 0.6}
        assert match_tree(t, scores) == pytest.approx(0.6)

    def test_lake_column_used_once(self):
        # Both query children want lake col 11; only one gets it.
        t = QueryTree(root=0, edges=((0, 1), (0, 2)))
        scores = {(0, 1, 10, 11): 0.5, (0, 2, 10, 11): 0.4}
        assert match_tree(t, scores) == pytest.approx(0.5)

    def test_second_level_requires_parent(self):
        t = QueryTree(root=0, edges=((0, 1), (1, 2)))
        scores = {(1, 2, 11, 12): 0.9}  # no root edge match
        assert match_tree(t, scores) == 0.0

    def test_second_level_chains(self):
        t = QueryTree(root=0, edges=((0, 1), (1, 2)))
        scores = {(0, 1, 10, 11): 0.5, (1, 2, 11, 12): 0.25}
        assert match_tree(t, scores) == pytest.approx(0.75)

    def test_second_level_consistent_with_parent_mapping(self):
        t = QueryTree(root=0, edges=((0, 1), (1, 2)))
        # level-2 edge attached to the wrong lake parent (99) is unusable.
        scores = {(0, 1, 10, 11): 0.5, (1, 2, 99, 12): 0.9}
        assert match_tree(t, scores) == pytest.approx(0.5)

    def test_best_root_chosen(self):
        t = QueryTree(root=0, edges=((0, 1),))
        scores = {(0, 1, 10, 11): 0.2, (0, 1, 20, 21): 0.8}
        assert match_tree(t, scores) == pytest.approx(0.8)

    def test_empty(self):
        t = QueryTree(root=0, edges=((0, 1),))
        assert match_tree(t, {}) == 0.0


class TestGreedyBipartite:
    def test_simple(self):
        assert greedy_bipartite_sum({(0, 1): 0.5, (1, 2): 0.25}) == pytest.approx(0.75)

    def test_one_to_one(self):
        # Greedy: (0,1)=0.9 assigned first, consuming qcol 0 and lake col
        # 1, so (1,1) and (0,2) are both blocked.
        s = greedy_bipartite_sum({(0, 1): 0.9, (0, 2): 0.5, (1, 1): 0.8})
        assert s == pytest.approx(0.9)

    def test_zero_scores_skipped(self):
        assert greedy_bipartite_sum({(0, 1): 0.0}) == 0.0

    def test_empty(self):
        assert greedy_bipartite_sum({}) == 0.0


class TestRankTiebreak:
    def test_deterministic(self):
        assert rank_tiebreak("q", "t") == rank_tiebreak("q", "t")

    def test_query_sensitive(self):
        assert rank_tiebreak("q1", "t") != rank_tiebreak("q2", "t")

    def test_not_lexicographic(self):
        # A correlated (sorted) tie-break would order these identically
        # to their names; the hash must not.
        names = [f"dom.{i:03d}" for i in range(50)]
        hashed = sorted(names, key=lambda t: rank_tiebreak("q", t))
        assert hashed != sorted(names)
