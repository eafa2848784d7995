"""Tests for the D3L-lite and TURL-proxy baselines."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.baselines.d3l import (
    _colvals,
    _format_hist,
    _grams,
    _name_tokens,
    _numeric_stats,
    build_d3l_index,
    run_d3l_queries,
)
from repro.baselines.turl_proxy import build_turl_index, run_turl_queries, turl_kb
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def d3l_results(spark, mini, mini_cells, mini_d3l_index):
    return run_d3l_queries(spark, mini_d3l_index, mini_cells, mini.queries, mini.k)


class TestD3LIndex:
    def test_frames_present(self, mini_d3l_index):
        assert set(mini_d3l_index.frames) == {
            "colvals", "col_sizes", "names", "formats", "grams",
            "gram_sizes", "numerics",
        }

    def test_format_patterns(self, spark):
        pdf = pd.DataFrame(
            [("t", 0, "c", 0, "Abc-123", 0), ("t", 0, "c", 1, "Xyz-987", 0)],
            columns=["table", "col", "col_name", "row", "value", "is_num"],
        )
        hist = _format_hist(spark.createDataFrame(pdf)).collect()
        assert len(hist) == 1 and hist[0]["pattern"] == "Aa-9" and hist[0]["n"] == 2

    def test_name_tokens(self, spark):
        pdf = pd.DataFrame(
            [("t", 0, "park_name", 0, "x", 0)],
            columns=["table", "col", "col_name", "row", "value", "is_num"],
        )
        toks = {r.token for r in _name_tokens(spark.createDataFrame(pdf)).collect()}
        assert toks == {"park", "name"}

    def test_grams(self, spark):
        pdf = pd.DataFrame(
            [("t", 0, "c", 0, "abcd", 0)],
            columns=["table", "col", "col_name", "row", "value", "is_num"],
        )
        grams = {r.gram for r in _grams(_colvals(spark.createDataFrame(pdf))).collect()}
        assert grams == {"abc", "bcd"}

    def test_numeric_stats(self, spark):
        pdf = pd.DataFrame(
            [("t", 0, "n", 0, "1.0", 1), ("t", 0, "n", 1, "3.0", 1)],
            columns=["table", "col", "col_name", "row", "value", "is_num"],
        )
        s = _numeric_stats(spark.createDataFrame(pdf)).collect()[0]
        assert s.mu == pytest.approx(2.0) and s.sd == pytest.approx(1.0)

    def test_oracle_colvals(self, spark, mini_cells, mini_d3l_index):
        got = mini_d3l_index.frames["col_sizes"]
        sql = """
            SELECT "table", col, COUNT(DISTINCT value) AS size
            FROM cells WHERE is_num = 0 AND value IS NOT NULL
            GROUP BY 1, 2
        """
        assert_equivalent(got, sql, cells=mini_cells)


class TestD3LQuery:
    def test_answers_all(self, mini, d3l_results):
        assert set(d3l_results) == {q for q, _ in mini.queries}

    def test_self_excluded(self, d3l_results):
        for q, lst in d3l_results.items():
            assert q not in [t for t, _ in lst]

    def test_at_most_k_sorted(self, mini, d3l_results):
        for lst in d3l_results.values():
            assert len(lst) <= mini.k
            scores = [s for _, s in lst]
            assert scores == sorted(scores, reverse=True)

    def test_retrieves_value_overlapping_tables(self, mini, d3l_results):
        gt = mini.gt_sets()
        hits = sum(
            1 for q, lst in d3l_results.items()
            if any(t in gt[q] for t, _ in lst[:3])
        )
        assert hits >= len(mini.queries) // 2

    def test_column_blindness(self, spark, mini, mini_cells, mini_d3l_index,
                              mini_index_full, d3l_results):
        """The designed blind spot: D3L's MAP on the relationship ground
        truth does not beat SANTOS_Full's."""
        from repro.core.search import run_queries
        from repro.eval.metrics import evaluate_all
        gt = mini.gt_sets()
        d3l_m = evaluate_all(
            {q: [t for t, _ in lst] for q, lst in d3l_results.items()}, gt, mini.k
        )
        santos = run_queries(
            spark, mini_index_full, mini_cells, mini.queries, mini.k, variant="full"
        )
        s_m = evaluate_all(
            {q: [t for t, _ in lst] for q, lst in santos.items()}, gt, mini.k
        )
        assert s_m["MAP"] >= d3l_m["MAP"]


class TestTurlProxy:
    def test_turl_kb_is_degraded(self, kb):
        t = turl_kb(kb)
        assert len(t.labels) < len(kb.labels)
        assert len(t.predicates) < len(kb.predicates)

    def test_turl_runs(self, spark, mini, mini_cells, kb):
        idx = build_turl_index(spark, mini_cells, kb)
        try:
            res = run_turl_queries(spark, idx, mini_cells, mini.queries, mini.k)
            assert set(res) == {q for q, _ in mini.queries}
        finally:
            idx.unpersist()

    def test_turl_deterministic(self, kb):
        a = turl_kb(kb, seed=7)
        b = turl_kb(kb, seed=7)
        pd.testing.assert_frame_equal(a.labels, b.labels)
