"""Unary functional dependency discovery over the melted lake.

SANTOS (Sec 7.2) keeps a column pair in the synthesized relationship
dictionary only if one column functionally determines the other,
discovered with FDEP's bottom-up variant restricted to unary FDs. On the
melted cell frame this reduces to one aggregation: ``c1 -> c2`` holds in
a table iff no value of ``c1`` co-occurs with two distinct values of
``c2`` (rows with a null on either side are ignored, standard for FD
mining over dirty open data).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def string_pairs(cells: DataFrame) -> DataFrame:
    """All ordered string-column value pairs, row-aligned.

    Returns ``(table, col1, col2, v1, v2)`` for every ordered pair of
    distinct non-numeric columns and every row where both values are
    non-null. This is the workhorse frame for both KB relationship
    semantics (Sec 4.3) and the synthesized relationship dictionary
    (Sec 7.2).
    """
    s = cells.filter((F.col("is_num") == 0) & F.col("value").isNotNull())
    a = s.select("table", "row", F.col("col").alias("col1"), F.col("value").alias("v1"))
    b = s.select("table", "row", F.col("col").alias("col2"), F.col("value").alias("v2"))
    return (
        a.join(b, ["table", "row"])
        .filter(F.col("col1") != F.col("col2"))
        .select("table", "col1", "col2", "v1", "v2")
    )


def unary_fds(cells: DataFrame) -> DataFrame:
    """Ordered column pairs ``(table, col1, col2)`` where ``col1 -> col2``.

    FDEP bottom-up, unary case: materialize all pairwise value
    combinations, then a pair is an FD iff its max number of distinct
    dependents per determinant value is 1.
    """
    pairs = string_pairs(cells)
    per_det = pairs.groupBy("table", "col1", "col2", "v1").agg(
        F.countDistinct("v2").alias("n_dep")
    )
    return (
        per_det.groupBy("table", "col1", "col2")
        .agg(F.max("n_dep").alias("max_dep"))
        .filter(F.col("max_dep") == 1)
        .select("table", "col1", "col2")
    )
