"""Property-based tests (hypothesis) for the pure scoring/metric layer."""
import math

from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.scoring import (
    build_query_tree,
    col_match,
    greedy_bipartite_sum,
    inter_method_pair_match,
    match_tree,
    rank_tiebreak,
)
from repro.eval.metrics import map_at_k, precision_at_k, recall_at_k
from repro.kb.schema import granularity_score

confs = st.dictionaries(
    st.sampled_from(["a", "b", "c", "d", "e"]),
    st.floats(min_value=0.0, max_value=1.0),
    max_size=5,
)
ranked_lists = st.lists(st.sampled_from([f"t{i}" for i in range(12)]), max_size=12, unique=True)
relevant_sets = st.sets(st.sampled_from([f"t{i}" for i in range(12)]), max_size=12)
ks = st.integers(min_value=1, max_value=15)


class TestMetricProperties:
    @given(ranked_lists, relevant_sets, ks)
    def test_precision_bounds(self, ranked, rel, k):
        assert 0.0 <= precision_at_k(ranked, rel, k) <= 1.0

    @given(ranked_lists, relevant_sets, ks)
    def test_recall_bounds(self, ranked, rel, k):
        assert 0.0 <= recall_at_k(ranked, rel, k) <= 1.0

    @given(ranked_lists, relevant_sets, ks)
    def test_map_bounds(self, ranked, rel, k):
        assert 0.0 <= map_at_k(ranked, rel, k) <= 1.0

    @given(ranked_lists, relevant_sets, ks)
    def test_recall_monotone_in_k(self, ranked, rel, k):
        assert recall_at_k(ranked, rel, k + 1) >= recall_at_k(ranked, rel, k)

    @given(ranked_lists, relevant_sets, ks)
    def test_precision_recall_consistency(self, ranked, rel, k):
        # hits counted by P and R agree.
        p = precision_at_k(ranked, rel, k)
        r = recall_at_k(ranked, rel, k)
        if rel:
            assert abs(p * k - r * len(rel)) < 1e-9

    @given(relevant_sets, ks)
    def test_perfect_ranking_maximizes_map(self, rel, k):
        ranked = sorted(rel)
        others = [f"t{i}" for i in range(12) if f"t{i}" not in rel]
        assert map_at_k(ranked + others, rel, k) >= map_at_k(others + ranked, rel, k)


class TestScoringProperties:
    @given(confs, confs)
    def test_col_match_bounds(self, q, t):
        s, a = col_match(q, t)
        assert 0.0 <= s <= 1.0
        if a is not None:
            assert s == q[a] * t[a]

    @given(confs, confs)
    def test_col_match_symmetric_score(self, q, t):
        assert col_match(q, t)[0] == col_match(t, q)[0]

    @given(
        st.floats(min_value=0, max_value=1), st.floats(min_value=0.01, max_value=1),
        st.floats(min_value=0.01, max_value=1), st.floats(min_value=0, max_value=1),
    )
    def test_inter_method_returns_one_branch(self, pm_kb, gs1, gs2, pm_synth):
        s, method = inter_method_pair_match(pm_kb, gs1, gs2, pm_synth)
        assert (method == "kb" and s == pm_kb) or (method == "synth" and s == pm_synth)

    @given(st.dictionaries(
        st.tuples(st.integers(0, 3), st.integers(0, 3)),
        st.floats(min_value=0, max_value=1), max_size=8,
    ))
    def test_greedy_bipartite_bounded_by_total(self, scores):
        s = greedy_bipartite_sum(scores)
        assert 0.0 <= s <= sum(v for v in scores.values() if v > 0) + 1e-9

    @given(st.sets(st.tuples(st.integers(0, 5), st.integers(0, 5)), max_size=10))
    def test_query_tree_is_tree(self, pairs):
        t = build_query_tree(0, pairs)
        children = [v for _, v in t.edges]
        assert len(children) == len(set(children))  # each node one parent
        assert 0 not in children                     # root has no parent

    @settings(max_examples=30)
    @given(st.dictionaries(
        st.tuples(st.integers(0, 2), st.integers(1, 3),
                  st.integers(10, 12), st.integers(13, 16)),
        st.floats(min_value=0.0, max_value=1.0), max_size=12,
    ))
    def test_match_tree_bounded(self, pair_scores):
        tree = build_query_tree(0, {(0, 1), (0, 2), (1, 3)})
        s = match_tree(tree, pair_scores)
        assert 0.0 <= s <= sum(v for v in pair_scores.values() if v > 0) + 1e-9


class TestMiscProperties:
    @given(st.integers(min_value=1, max_value=10**9))
    def test_granularity_in_unit_interval(self, n):
        assert 0.0 < granularity_score(n) <= 1.0

    @given(st.integers(min_value=1, max_value=10**8))
    def test_granularity_matches_formula(self, n):
        expected = 1.0 / max(1.0, math.log10(n))
        assert granularity_score(n) == expected

    @given(st.text(max_size=30), st.text(max_size=30))
    def test_tiebreak_total(self, q, t):
        assert isinstance(rank_tiebreak(q, t), int)
        assert rank_tiebreak(q, t) == rank_tiebreak(q, t)
