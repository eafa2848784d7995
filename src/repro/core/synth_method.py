"""Synthesized-KB semantic graphs — Sec 5 and Sec 7.2.

The synthesized KB replaces the curated KB with co-occurrence knowledge
from the lake itself:

- *Synthesized column semantics* (Eq 5): every lake column is its own
  synthesized type; a column ``c`` inherits the type of column ``cj``
  with confidence ``|c ∩ cj| / |c|`` over distinct values.
- *Synthesized relationship semantics* (Eq 6): every ordered column pair
  in a unary FD is its own relationship type; a pair inherits another
  pair's type with confidence given by distinct value-pair overlap.
- *Synthesized relationship dictionary* (Sec 7.2 / Fig 5): each value
  pair is annotated with the relationship types of every column pair,
  scored by the column-pair-level overlap and **max-merged** across the
  column pairs that contain the value pair. Our unit tests reproduce
  the paper's Fig 5 table exactly (see DESIGN.md §3.3).

Synthesized types carry no hierarchy, so ``gs = 1`` everywhere (Sec 5.1).
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.fd import string_pairs, unary_fds
from repro.kb.yago_lite import KB


def column_values(cells: DataFrame) -> DataFrame:
    """Distinct ``(table, col, value)`` for string columns — the basis of
    the synthesized type dictionary."""
    return (
        cells.filter((F.col("is_num") == 0) & F.col("value").isNotNull())
        .select("table", "col", "value")
        .distinct()
    )


def column_sizes(colvals: DataFrame) -> DataFrame:
    return colvals.groupBy("table", "col").agg(F.countDistinct("value").alias("size"))


def column_overlap_matrix(
    colvals: DataFrame, sizes: DataFrame, *, hot_cap: int = 200
) -> DataFrame:
    """Directed Eq 5 confidences between lake columns, self rows included.

    Returns ``(table, col, ttable, tcol, conf)`` with
    ``conf = |c ∩ cj| / |c|`` for ``c=(table,col)``, ``cj=(ttable,tcol)``.
    Values occurring in more than ``hot_cap`` columns are dropped from
    the overlap numerators (stop-value filtering; DESIGN.md §5) — they
    carry no discriminative signal and would square the join.
    """
    val_freq = colvals.groupBy("value").agg(F.count("*").alias("n_cols"))
    cool = colvals.join(
        val_freq.filter(F.col("n_cols") <= hot_cap).select("value"), "value"
    )
    left = cool
    right = cool.select(
        F.col("table").alias("ttable"), F.col("col").alias("tcol"), "value"
    )
    ov = (
        left.join(right, "value")
        .filter((F.col("table") != F.col("ttable")) | (F.col("col") != F.col("tcol")))
        .groupBy("table", "col", "ttable", "tcol")
        .agg(F.count("*").alias("n_shared"))
    )
    cross = (
        ov.join(sizes, ["table", "col"])
        .withColumn("conf", F.col("n_shared") / F.col("size"))
        .select("table", "col", "ttable", "tcol", "conf")
    )
    self_rows = sizes.select(
        "table", "col", F.col("table").alias("ttable"), F.col("col").alias("tcol"),
        F.lit(1.0).alias("conf"),
    )
    return cross.unionByName(self_rows)


def kb_value_pairs(spark: SparkSession, kb: KB) -> DataFrame:
    """Distinct label pairs that carry some predicate in the KB — used to
    exclude KB-known pairs from the synthesized dictionary (Sec 7.2)."""
    k = kb.to_spark(spark)
    lab1 = k["labels"].select(F.col("entity_id").alias("subj_id"), F.col("label").alias("v1"))
    lab2 = k["labels"].select(F.col("entity_id").alias("obj_id"), F.col("label").alias("v2"))
    return (
        k["triples"].join(lab1, "subj_id").join(lab2, "obj_id")
        .select("v1", "v2")
        .distinct()
    )


def pair_values(
    cells: DataFrame, fds: DataFrame, *, exclude_pairs: DataFrame | None = None
) -> DataFrame:
    """Distinct value pairs of FD column pairs: ``(table, col1, col2, v1, v2)``.

    ``exclude_pairs`` (``v1``, ``v2``) removes pairs already known to the
    KB when building the full-mode synthesized dictionary.
    """
    pv = string_pairs(cells).join(fds, ["table", "col1", "col2"]).distinct()
    if exclude_pairs is not None:
        pv = pv.join(F.broadcast(exclude_pairs), ["v1", "v2"], "left_anti")
    return pv


def pair_sizes(pair_vals: DataFrame) -> DataFrame:
    return pair_vals.groupBy("table", "col1", "col2").agg(
        F.countDistinct("v1", "v2").alias("size")
    )


def pair_overlap_matrix(pair_vals: DataFrame, sizes: DataFrame) -> DataFrame:
    """Directed Eq 6 confidences between FD column pairs, self included.

    Returns ``(table, col1, col2, ttable, tcol1, tcol2, conf)`` with
    ``conf = |(c1,c2) ∩ (d1,d2)| / |(c1,c2)|``.
    """
    left = pair_vals
    right = pair_vals.select(
        F.col("table").alias("ttable"), F.col("col1").alias("tcol1"),
        F.col("col2").alias("tcol2"), "v1", "v2",
    )
    ov = (
        left.join(right, ["v1", "v2"])
        .filter(
            (F.col("table") != F.col("ttable"))
            | (F.col("col1") != F.col("tcol1"))
            | (F.col("col2") != F.col("tcol2"))
        )
        .groupBy("table", "col1", "col2", "ttable", "tcol1", "tcol2")
        .agg(F.count("*").alias("n_shared"))
    )
    cross = (
        ov.join(sizes, ["table", "col1", "col2"])
        .withColumn("conf", F.col("n_shared") / F.col("size"))
        .select("table", "col1", "col2", "ttable", "tcol1", "tcol2", "conf")
    )
    self_rows = sizes.select(
        "table", "col1", "col2", F.col("table").alias("ttable"),
        F.col("col1").alias("tcol1"), F.col("col2").alias("tcol2"),
        F.lit(1.0).alias("conf"),
    )
    return cross.unionByName(self_rows)


def pair_dictionary(pair_vals: DataFrame, pair_overlap: DataFrame) -> DataFrame:
    """The Synthesized Relationship Dictionary of Sec 7.2 / Fig 5.

    Each value pair is assigned every column-pair relationship type with
    the column-pair-level overlap score, max-merged over the column
    pairs the value pair belongs to. Returns
    ``(v1, v2, rtable, rcol1, rcol2, score)``.
    """
    joined = pair_vals.join(pair_overlap, ["table", "col1", "col2"]).select(
        "v1", "v2",
        F.col("ttable").alias("rtable"), F.col("tcol1").alias("rcol1"),
        F.col("tcol2").alias("rcol2"), "conf",
    )
    return joined.groupBy("v1", "v2", "rtable", "rcol1", "rcol2").agg(
        F.max("conf").alias("score")
    )


def query_column_conf(q_colvals: DataFrame, colvals: DataFrame) -> DataFrame:
    """Query-side synthesized CS: Eq 5 applied to a query column against
    every lake column (the query column is treated like any other lake
    column). Returns ``(qtable, qcol, ttable, tcol, conf)``."""
    q = q_colvals.select(
        F.col("table").alias("qtable"), F.col("col").alias("qcol"), "value"
    )
    q_sizes = q.groupBy("qtable", "qcol").agg(F.countDistinct("value").alias("qsize"))
    lake = colvals.select(
        F.col("table").alias("ttable"), F.col("col").alias("tcol"), "value"
    )
    ov = (
        q.join(lake, "value")
        .groupBy("qtable", "qcol", "ttable", "tcol")
        .agg(F.count("*").alias("n_shared"))
    )
    return (
        ov.join(q_sizes, ["qtable", "qcol"])
        .withColumn("conf", F.col("n_shared") / F.col("qsize"))
        .select("qtable", "qcol", "ttable", "tcol", "conf")
    )


def query_pair_conf(q_pair_vals: DataFrame, pair_dict: DataFrame) -> DataFrame:
    """Query-side synthesized RS via dictionary lookup.

    For a query ordered column pair, each of its value pairs is looked
    up in the synthesized relationship dictionary; the confidence for a
    relationship type is the sum of that type's scores over found value
    pairs, normalized by the number of found value pairs (mirroring
    Eq 4's normalization by KB-mapped pairs). Returns
    ``(qtable, qcol1, qcol2, rtable, rcol1, rcol2, conf)``.
    """
    q = q_pair_vals.select(
        F.col("table").alias("qtable"), F.col("col1").alias("qcol1"),
        F.col("col2").alias("qcol2"), "v1", "v2",
    )
    hits = q.join(pair_dict, ["v1", "v2"])
    found = hits.groupBy("qtable", "qcol1", "qcol2").agg(
        F.countDistinct("v1", "v2").alias("n_found")
    )
    agg = hits.groupBy("qtable", "qcol1", "qcol2", "rtable", "rcol1", "rcol2").agg(
        F.sum("score").alias("s")
    )
    return (
        agg.join(found, ["qtable", "qcol1", "qcol2"])
        .withColumn("conf", F.least(F.lit(1.0), F.col("s") / F.col("n_found")))
        .select("qtable", "qcol1", "qcol2", "rtable", "rcol1", "rcol2", "conf")
    )


def build_synth_frames(
    spark: SparkSession,
    cells: DataFrame,
    *,
    kb: KB | None = None,
    exclude_kb_pairs: bool = False,
    hot_cap: int = 200,
) -> dict[str, DataFrame]:
    """Build all synthesized-KB index frames for a lake.

    Returns dict with keys ``colvals``, ``col_sizes``, ``col_overlap``,
    ``fds``, ``pair_vals``, ``pair_sizes``, ``pair_overlap``,
    ``pair_dict``. Caller is responsible for persisting.
    """
    colvals = column_values(cells)
    sizes = column_sizes(colvals)
    col_ov = column_overlap_matrix(colvals, sizes, hot_cap=hot_cap)
    fds = unary_fds(cells)
    excl = None
    if exclude_kb_pairs:
        assert kb is not None, "exclude_kb_pairs requires a KB"
        excl = kb_value_pairs(spark, kb)
    pv = pair_values(cells, fds, exclude_pairs=excl)
    psz = pair_sizes(pv)
    pov = pair_overlap_matrix(pv, psz)
    pdict = pair_dictionary(pv, pov)
    return {
        "colvals": colvals, "col_sizes": sizes, "col_overlap": col_ov,
        "fds": fds, "pair_vals": pv, "pair_sizes": psz,
        "pair_overlap": pov, "pair_dict": pdict,
    }
