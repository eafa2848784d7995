"""Tests for the end-to-end evaluation harness."""
import pytest

from repro.eval.harness import (
    MethodResult,
    cleanup_indexes,
    coverage_sweep,
    fig7_rows,
    fig10_rows,
    run_benchmark,
)


@pytest.fixture(scope="module")
def mini_run(spark, mini, kb):
    shared = {}
    res = run_benchmark(
        spark, mini, kb,
        methods=("santos_full", "santos_col", "d3l"),
        shared_indexes=shared,
    )
    yield res
    cleanup_indexes(shared)


class TestRunBenchmark:
    def test_all_methods_present(self, mini_run):
        assert set(mini_run) == {"santos_full", "santos_col", "d3l"}

    def test_metrics_in_range(self, mini_run):
        for r in mini_run.values():
            for v in r.metrics.values():
                assert 0.0 <= v <= 1.0

    def test_timings_recorded(self, mini_run):
        for r in mini_run.values():
            assert r.index_seconds > 0
            assert sum(r.query_seconds) > 0

    def test_santos_beats_d3l_on_mini(self, mini_run):
        assert (
            mini_run["santos_full"].metrics["MAP"]
            >= mini_run["d3l"].metrics["MAP"]
        )

    def test_col_reuses_full_index(self, spark, mini, kb):
        shared = {}
        run_benchmark(
            spark, mini, kb, methods=("santos_full", "santos_col"),
            shared_indexes=shared,
        )
        try:
            assert set(shared) == {"santos_full"}
        finally:
            cleanup_indexes(shared)

    def test_per_query_timing(self, spark, mini, kb):
        shared = {}
        try:
            res = run_benchmark(
                spark, mini, kb, methods=("santos_kb",),
                per_query_timing=True, shared_indexes=shared,
            )
            assert len(res["santos_kb"].query_seconds) == len(mini.queries)
        finally:
            cleanup_indexes(shared)


@pytest.fixture(scope="module")
def mini_sweep(spark, mini, kb):
    return coverage_sweep(spark, mini, kb, fractions=(0.0, 1.0))


class TestCoverageSweep:
    def test_endpoints(self, mini_sweep):
        assert set(mini_sweep) == {0.0, 1.0}
        for v in mini_sweep.values():
            assert 0.0 <= v <= 1.0

    def test_more_kb_not_catastrophically_worse(self, mini_sweep):
        assert mini_sweep[1.0] >= mini_sweep[0.0] - 0.15


class TestRendering:
    def _mr(self):
        return MethodResult(
            method="santos_full",
            metrics={"P": 0.7, "R": 0.37, "MAP": 0.8},
            index_seconds=12.0, query_seconds=[1.0, 2.0, 3.0],
        )

    def test_fig7_row(self):
        rows = fig7_rows("TUS", 20, {"santos_full": self._mr()})
        assert rows == ["| TUS (k=20) | SANTOS | 0.80 | 0.70 | 0.37 |"]

    def test_fig7_no_recall(self):
        rows = fig7_rows("LARGE", 20, {"santos_full": self._mr()}, with_recall=False)
        assert rows[0].endswith("| - |")

    def test_fig10_row(self):
        rows = fig10_rows("TUS", {"santos_full": self._mr()})
        assert "12.0 s" in rows[0] and "2.00" in rows[0]

    def test_query_stats(self):
        s = self._mr().query_stats()
        assert s["avg"] == pytest.approx(2.0)
        assert s["p10"] <= s["avg"] <= s["p90"]
