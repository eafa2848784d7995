"""Integration tests for the SANTOS index + query phases on the mini lake."""
import pytest

from repro.core.search import build_index, run_queries


@pytest.fixture(scope="module")
def full_results(spark, mini, mini_cells, mini_index_full):
    return run_queries(
        spark, mini_index_full, mini_cells, mini.queries, mini.k, variant="full"
    )


class TestIndexBuild:
    def test_full_mode_frames(self, mini_index_full):
        assert mini_index_full.has_kb() and mini_index_full.has_synth()
        for f in ("kb_cs", "kb_rs", "colvals", "col_overlap", "pair_overlap", "pair_dict"):
            assert f in mini_index_full.frames

    def test_build_time_recorded(self, mini_index_full):
        assert mini_index_full.build_seconds > 0

    def test_kb_mode(self, spark, mini_cells, kb):
        idx = build_index(spark, mini_cells, kb, mode="kb")
        try:
            assert idx.has_kb() and not idx.has_synth()
        finally:
            idx.unpersist()

    def test_synth_mode_no_kb(self, spark, mini_cells):
        idx = build_index(spark, mini_cells, None, mode="synth")
        try:
            assert idx.has_synth() and not idx.has_kb()
        finally:
            idx.unpersist()

    def test_kb_mode_requires_kb(self, spark, mini_cells):
        with pytest.raises(AssertionError):
            build_index(spark, mini_cells, None, mode="kb")


class TestRunQueries:
    def test_all_queries_answered(self, mini, full_results):
        assert set(full_results) == {q for q, _ in mini.queries}

    def test_self_excluded(self, full_results):
        for q, lst in full_results.items():
            assert q not in [t for t, _ in lst]

    def test_at_most_k(self, mini, full_results):
        for lst in full_results.values():
            assert len(lst) <= mini.k

    def test_sorted_descending(self, full_results):
        for lst in full_results.values():
            scores = [s for _, s in lst]
            assert scores == sorted(scores, reverse=True)

    def test_positive_scores(self, full_results):
        for lst in full_results.values():
            assert all(s > 0 for _, s in lst)

    def test_top1_is_same_domain(self, mini, full_results):
        gt = mini.gt_sets()
        hits = sum(
            1 for q, lst in full_results.items() if lst and lst[0][0] in gt[q]
        )
        assert hits >= len(mini.queries) - 1

    def test_different_root_domain_rejected(self, mini, full_results):
        """Tables whose root column type differs from the query intent
        never appear: a birthplaces query must not retrieve parks tables
        (Ex 9: no good match with the intent column -> not a candidate)."""
        for q, lst in full_results.items():
            qdom = q.split(".")[1]
            other_rel = {"parks", "birthplaces", "albums"} - {qdom}
            for t, _ in lst:
                assert t.split(".")[1] not in other_rel

    def test_distractors_rejected(self, full_results):
        for lst in full_results.values():
            for t, _ in lst:
                assert "accidents" not in t and "phone_directory" not in t

    @pytest.mark.parametrize("variant", ["kb", "synth", "col"])
    def test_variants_run(self, spark, mini, mini_cells, mini_index_full, variant):
        res = run_queries(
            spark, mini_index_full, mini_cells, mini.queries, mini.k, variant=variant
        )
        assert set(res) == {q for q, _ in mini.queries}
        for q, lst in res.items():
            assert q not in [t for t, _ in lst]
            assert len(lst) <= mini.k

    def test_variant_requires_capability(self, spark, mini, mini_cells):
        idx = build_index(spark, mini_cells, None, mode="synth")
        try:
            with pytest.raises(AssertionError):
                run_queries(spark, idx, mini_cells, mini.queries, mini.k, variant="kb")
        finally:
            idx.unpersist()

    def test_single_query_subset(self, spark, mini, mini_cells, mini_index_full):
        q = mini.queries[0]
        res = run_queries(spark, mini_index_full, mini_cells, [q], mini.k)
        assert set(res) == {q[0]}

    def test_full_at_least_as_good_as_variants(self, spark, mini, mini_cells,
                                               mini_index_full, full_results):
        from repro.eval.metrics import evaluate_all
        gt = mini.gt_sets()
        m_full = evaluate_all(
            {q: [t for t, _ in lst] for q, lst in full_results.items()}, gt, mini.k
        )
        res_col = run_queries(
            spark, mini_index_full, mini_cells, mini.queries, mini.k, variant="col"
        )
        m_col = evaluate_all(
            {q: [t for t, _ in lst] for q, lst in res_col.items()}, gt, mini.k
        )
        assert m_full["MAP"] >= m_col["MAP"] - 0.05
