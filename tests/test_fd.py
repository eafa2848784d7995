"""Tests for unary FD discovery, with DuckDB oracle cross-checks."""
import pandas as pd
import pytest

from repro.core.fd import string_pairs, unary_fds
from repro.oracle import assert_equivalent


def _cells(spark, rows):
    """rows: list of (table, col, col_name, row, value, is_num)."""
    pdf = pd.DataFrame(
        rows, columns=["table", "col", "col_name", "row", "value", "is_num"]
    )
    return spark.createDataFrame(pdf)


@pytest.fixture(scope="module")
def toy(spark):
    # t1: col0 -> col1 holds (functional), col1 -> col0 fails (b maps to x,z).
    rows = []
    data = [("x", "b"), ("y", "b"), ("x", "b"), ("z", "c")]
    for i, (a, b) in enumerate(data):
        rows.append(("t1", 0, "a", i, a, 0))
        rows.append(("t1", 1, "b", i, b, 0))
    # wait: col1->col0: b co-occurs with x and y -> fails. col0->col1: x->b,
    # y->b, z->c -> holds.
    return _cells(spark, rows)


class TestUnaryFDs:
    def test_direction(self, spark, toy):
        fds = {(r.col1, r.col2) for r in unary_fds(toy).collect()}
        assert (0, 1) in fds
        assert (1, 0) not in fds

    def test_nulls_ignored(self, spark):
        rows = [
            ("t", 0, "a", 0, "x", 0), ("t", 1, "b", 0, "p", 0),
            ("t", 0, "a", 1, "x", 0), ("t", 1, "b", 1, None, 0),
        ]
        fds = {(r.col1, r.col2) for r in unary_fds(_cells(spark, rows)).collect()}
        assert (0, 1) in fds  # the null row does not break the FD

    def test_numeric_columns_excluded(self, spark):
        rows = [
            ("t", 0, "a", 0, "x", 0), ("t", 1, "n", 0, "1", 1),
            ("t", 0, "a", 1, "y", 0), ("t", 1, "n", 1, "2", 1),
        ]
        fds = unary_fds(_cells(spark, rows)).collect()
        assert fds == []

    def test_broken_fd(self, spark):
        # x maps to both p and q: 0 -> 1 broken; but p -> x, q -> x holds.
        rows = [
            ("t", 0, "a", 0, "x", 0), ("t", 1, "b", 0, "p", 0),
            ("t", 0, "a", 1, "x", 0), ("t", 1, "b", 1, "q", 0),
        ]
        fds = {(r.col1, r.col2) for r in unary_fds(_cells(spark, rows)).collect()}
        assert fds == {(1, 0)}

    def test_per_table(self, spark):
        rows = [
            ("t1", 0, "a", 0, "x", 0), ("t1", 1, "b", 0, "p", 0),
            ("t2", 0, "a", 0, "x", 0), ("t2", 1, "b", 0, "p", 0),
            ("t2", 0, "a", 1, "x", 0), ("t2", 1, "b", 1, "q", 0),
        ]
        fds = {(r.table, r.col1, r.col2) for r in unary_fds(_cells(spark, rows)).collect()}
        assert ("t1", 0, 1) in fds and ("t1", 1, 0) in fds
        assert ("t2", 0, 1) not in fds

    def test_oracle_pair_counts(self, spark, toy):
        """string_pairs distinct counts match DuckDB over the same cells."""
        got = (
            string_pairs(toy).distinct()
            .groupBy("table", "col1", "col2")
            .count()
            .withColumnRenamed("count", "n")
        )
        sql = """
            SELECT a.table AS "table", a.col AS col1, b.col AS col2,
                   COUNT(DISTINCT (a.value, b.value)) AS n
            FROM cells a JOIN cells b
              ON a.table = b.table AND a.row = b.row AND a.col <> b.col
            WHERE a.is_num = 0 AND b.is_num = 0
              AND a.value IS NOT NULL AND b.value IS NOT NULL
            GROUP BY 1, 2, 3
        """
        assert_equivalent(got, sql, cells=toy)

    def test_oracle_fd_check(self, spark, mini_cells):
        """FD verdicts on the mini lake match a DuckDB formulation."""
        got = unary_fds(mini_cells)
        sql = """
            WITH pairs AS (
                SELECT a.table AS t, a.col AS col1, b.col AS col2,
                       a.value AS v1, b.value AS v2
                FROM cells a JOIN cells b
                  ON a.table = b.table AND a.row = b.row AND a.col <> b.col
                WHERE a.is_num = 0 AND b.is_num = 0
                  AND a.value IS NOT NULL AND b.value IS NOT NULL
            ), per_det AS (
                SELECT t, col1, col2, v1, COUNT(DISTINCT v2) AS cnt
                FROM pairs GROUP BY t, col1, col2, v1
            )
            SELECT t AS "table", col1, col2
            FROM per_det GROUP BY t, col1, col2
            HAVING MAX(cnt) = 1
        """
        assert_equivalent(got, sql, cells=mini_cells)

    def test_string_pairs_no_self(self, spark, toy):
        assert string_pairs(toy).filter("col1 = col2").count() == 0
