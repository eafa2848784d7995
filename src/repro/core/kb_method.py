"""Semantic graph creation with the (YAGO-lite) knowledge base — Sec 4.

Column semantics (CS): distinct cell values are mapped through the
entity dictionary (labels) to entities, to their leaf types, and up the
ISA closure; per-column type frequencies give the frequency score
``fs`` (Eq 1), KB type statistics give the granularity score ``gs``
(Eq 2, see ``repro.kb.schema.granularity_score``), and the majority
top-level type enforces semantic consistency (ties broken toward the
rarer top-level type, footnote 3).

Relationship semantics (RS): ordered column-pair value pairs are mapped
to entity pairs and joined with the KB triples; ``RS_CONF`` is the
fraction of KB-mapped value pairs carrying the predicate (Eq 4), and
only the maximum-score predicate per ordered pair is kept (ties broken
toward the rarer predicate, footnote 4).

Everything is expressed as DataFrame scans/joins over the melted lake;
the KB tables are broadcast-sized dimensions.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.core.fd import string_pairs
from repro.kb.yago_lite import KB


def column_semantics(spark: SparkSession, cells: DataFrame, kb: KB) -> DataFrame:
    """Per-column KB column semantics with confidence scores.

    Returns ``(table, col, type_id, fs, gs, conf_dl, conf_q)`` where
    ``conf_dl = fs*gs`` (data-lake side of Eq 3) and ``conf_q = fs``
    (query side). Only types under the column's majority top-level type
    survive (semantic consistency, Sec 4.1).
    """
    k = kb.to_spark(spark)
    vals = (
        cells.filter((F.col("is_num") == 0) & F.col("value").isNotNull())
        .select("table", "col", "value")
        .distinct()
    )
    mapped = vals.join(F.broadcast(k["labels"]), vals.value == k["labels"].label).select(
        "table", "col", "value", "entity_id"
    )
    # |c_KB|: unique values of the column mapped to any entity.
    c_kb = mapped.groupBy("table", "col").agg(
        F.countDistinct("value").alias("n_kb")
    )
    expanded = (
        mapped.join(F.broadcast(k["entity_types"]), "entity_id")
        .join(F.broadcast(k["ancestors"]), "type_id")
        .select("table", "col", "value", F.col("anc_id").alias("a"))
        .distinct()
    )
    counts = expanded.groupBy("table", "col", "a").agg(
        F.countDistinct("value").alias("n_a")
    )
    types = k["types"]
    counts = counts.join(
        F.broadcast(
            types.select(
                F.col("type_id").alias("a"), "top_id", "stat_count", "gs",
                F.col("parent_id").alias("_parent"),
            )
        ),
        "a",
    )
    # Majority top-level type per column; tie -> rarer (smaller stat_count).
    top_rows = counts.filter(F.col("_parent") == -1)
    w = Window.partitionBy("table", "col").orderBy(
        F.desc("n_a"), F.asc("stat_count"), F.asc("a")
    )
    chosen_top = (
        top_rows.withColumn("_rk", F.row_number().over(w))
        .filter(F.col("_rk") == 1)
        .select("table", "col", F.col("a").alias("chosen_top"))
    )
    cs = (
        counts.join(chosen_top, ["table", "col"])
        .filter(F.col("top_id") == F.col("chosen_top"))
        .join(c_kb, ["table", "col"])
        .withColumn("fs", F.col("n_a") / F.col("n_kb"))
        .withColumn("conf_dl", F.col("fs") * F.col("gs"))
        .withColumn("conf_q", F.col("fs"))
        .select(
            "table", "col", F.col("a").alias("type_id"), "fs", "gs",
            "conf_dl", "conf_q",
        )
    )
    return cs


def relationship_semantics(spark: SparkSession, cells: DataFrame, kb: KB) -> DataFrame:
    """Per-ordered-column-pair KB relationship semantics (Eq 4).

    Returns ``(table, col1, col2, pred_id, rs_conf)`` where ``col1`` is
    the subject-side column. Only the argmax predicate per ordered pair
    is kept (tie -> smaller KB ``pair_count``). Both orientations of a
    column pair are produced because the pair enumeration is ordered.
    """
    k = kb.to_spark(spark)
    pairs = string_pairs(cells).distinct()
    lab1 = k["labels"].select(F.col("label").alias("v1"), F.col("entity_id").alias("e1"))
    lab2 = k["labels"].select(F.col("label").alias("v2"), F.col("entity_id").alias("e2"))
    both = (
        pairs.join(F.broadcast(lab1), "v1")
        .join(F.broadcast(lab2), "v2")
        .select("table", "col1", "col2", "v1", "v2", "e1", "e2")
    )
    denom = both.groupBy("table", "col1", "col2").agg(
        F.countDistinct("v1", "v2").alias("n_kb_pairs")
    )
    trip = k["triples"].select(
        F.col("subj_id").alias("e1"), F.col("obj_id").alias("e2"), "pred_id"
    )
    with_pred = both.join(F.broadcast(trip), ["e1", "e2"])
    num = with_pred.groupBy("table", "col1", "col2", "pred_id").agg(
        F.countDistinct("v1", "v2").alias("n_pred_pairs")
    )
    scored = (
        num.join(denom, ["table", "col1", "col2"])
        .withColumn("rs_conf", F.col("n_pred_pairs") / F.col("n_kb_pairs"))
        .join(F.broadcast(k["predicates"].select("pred_id", "pair_count")), "pred_id")
    )
    w = Window.partitionBy("table", "col1", "col2").orderBy(
        F.desc("rs_conf"), F.asc("pair_count"), F.asc("pred_id")
    )
    return (
        scored.withColumn("_rk", F.row_number().over(w))
        .filter(F.col("_rk") == 1)
        .select("table", "col1", "col2", "pred_id", "rs_conf")
    )
