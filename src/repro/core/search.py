"""SANTOS pre-processing and query phases — Sec 7.3–7.4.

``build_index`` runs the offline phase: KB column/relationship semantics
(Sec 4) and/or the synthesized KB (Sec 5, Sec 7.2) are computed with
DataFrame scans and KB joins over the melted lake and persisted — these
are the node/edge inverted indexes (frames keyed by type / predicate /
synthesized relationship are exactly inverted indexes once joined on).

``run_queries`` runs the online phase for a set of query tables in one
batched dataflow: the query tables are annotated the same way (query-
side confidences per Eq 3), broadcast against the indexes to produce
colMatch/relMatch/pairMatch scores (Eq 7–10) per candidate table, and
the final consistent tree embedding (Eq 11) is evaluated on the driver
per (query, candidate) group — candidate groups are tiny after the
semantic joins, which is what makes SANTOS query-time fast (Sec 8.4).

Variants (Sec 8.2–8.3): ``full`` (Eq 10 inter-method), ``kb``,
``synth``, and ``col`` (column semantics only, SANTOS_Col).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core import kb_method, synth_method
from repro.core.fd import string_pairs
from repro.core.scoring import (
    QueryTree,
    build_query_tree,
    greedy_bipartite_sum,
    match_tree,
    rank_tiebreak,
)
from repro.kb.yago_lite import KB

VARIANTS = ("full", "kb", "synth", "col")


@dataclass
class SantosIndex:
    """Persisted index frames + the KB handle and build timing."""

    mode: str                       # "kb" | "synth" | "full"
    kb: KB | None
    frames: dict[str, DataFrame]
    build_seconds: float = 0.0
    hot_cap: int = 200
    _persisted: list[DataFrame] = field(default_factory=list, repr=False)

    def has_kb(self) -> bool:
        return "kb_cs" in self.frames

    def has_synth(self) -> bool:
        return "colvals" in self.frames

    def unpersist(self) -> None:
        for df in self._persisted:
            df.unpersist()
        self._persisted.clear()


def build_index(
    spark: SparkSession,
    cells: DataFrame,
    kb: KB | None,
    *,
    mode: str = "full",
    hot_cap: int = 200,
) -> SantosIndex:
    """Offline pre-processing (Sec 7.3). ``mode`` selects which semantic
    graph sources are indexed; ``full`` builds both and excludes
    KB-known value pairs from the synthesized dictionary (Sec 7.2)."""
    assert mode in ("kb", "synth", "full"), mode
    t0 = time.perf_counter()
    frames: dict[str, DataFrame] = {}
    persisted: list[DataFrame] = []

    def keep(name: str, df: DataFrame) -> None:
        df = df.persist()
        df.count()
        frames[name] = df
        persisted.append(df)

    if mode in ("kb", "full"):
        assert kb is not None, "kb mode requires a KB"
        keep("kb_cs", kb_method.column_semantics(spark, cells, kb))
        keep("kb_rs", kb_method.relationship_semantics(spark, cells, kb))
    if mode in ("synth", "full"):
        synth = synth_method.build_synth_frames(
            spark, cells, kb=kb,
            exclude_kb_pairs=(mode == "full" and kb is not None),
            hot_cap=hot_cap,
        )
        for name in ("colvals", "col_overlap", "pair_vals", "pair_overlap", "pair_dict"):
            keep(name, synth[name])
    return SantosIndex(
        mode=mode, kb=kb, frames=frames,
        build_seconds=time.perf_counter() - t0, hot_cap=hot_cap,
        _persisted=persisted,
    )


# ---------------------------------------------------------------------------
# Query phase
# ---------------------------------------------------------------------------

def _flip_normalize(pm: DataFrame) -> DataFrame:
    """Union pairMatch rows with their simultaneous (query, lake) flips
    and keep the max, so a tree edge (u, v) can always be looked up in
    (parent, child) orientation regardless of which orientation the
    underlying predicate/FD was stored in."""
    flipped = pm.select(
        "qtable",
        F.col("qcol2").alias("qcol1"), F.col("qcol1").alias("qcol2"),
        "table",
        F.col("tcol2").alias("tcol1"), F.col("tcol1").alias("tcol2"),
        "pm",
    )
    return (
        pm.select("qtable", "qcol1", "qcol2", "table", "tcol1", "tcol2", "pm")
        .unionByName(flipped)
        .groupBy("qtable", "qcol1", "qcol2", "table", "tcol1", "tcol2")
        .agg(F.max("pm").alias("pm"))
    )


def _col_match_kb(q_cs: DataFrame, kb_cs: DataFrame) -> DataFrame:
    """Eq 7 over the KB method: (qtable, qcol, table, tcol, cm, gs)."""
    lake = kb_cs.select(
        "table", F.col("col").alias("tcol"), "type_id",
        F.col("conf_dl").alias("t_conf"), "gs",
    )
    q = q_cs.select(
        F.col("table").alias("qtable"), F.col("col").alias("qcol"),
        "type_id", F.col("conf_q").alias("q_conf"),
    )
    j = (
        q.join(lake, "type_id")
        .filter(F.col("table") != F.col("qtable"))
        .withColumn("score", F.col("q_conf") * F.col("t_conf"))
    )
    return j.groupBy("qtable", "qcol", "table", "tcol").agg(
        F.expr("max_by(struct(score, gs), struct(score, gs))").alias("m")
    ).select(
        "qtable", "qcol", "table", "tcol",
        F.col("m.score").alias("cm"), F.col("m.gs").alias("gs"),
    )


def _col_match_synth(q_synth_cs: DataFrame, col_overlap: DataFrame) -> DataFrame:
    """Eq 7 over the synthesized method: types are lake columns."""
    lake = col_overlap.select(
        F.col("table").alias("table"), F.col("col").alias("tcol_"),
        F.col("ttable").alias("a_t"), F.col("tcol").alias("a_c"),
        F.col("conf").alias("t_conf"),
    )
    q = q_synth_cs.select(
        "qtable", "qcol",
        F.col("ttable").alias("a_t"), F.col("tcol").alias("a_c"),
        F.col("conf").alias("q_conf"),
    )
    j = (
        q.join(lake, ["a_t", "a_c"])
        .filter(F.col("table") != F.col("qtable"))
        .withColumn("score", F.col("q_conf") * F.col("t_conf"))
    )
    return j.groupBy("qtable", "qcol", "table", F.col("tcol_").alias("tcol")).agg(
        F.max("score").alias("cm")
    )


def _rel_match_kb(q_rs: DataFrame, kb_rs: DataFrame) -> DataFrame:
    lake = kb_rs.select(
        "table", F.col("col1").alias("tcol1"), F.col("col2").alias("tcol2"),
        "pred_id", F.col("rs_conf").alias("t_conf"),
    )
    q = q_rs.select(
        F.col("table").alias("qtable"), F.col("col1").alias("qcol1"),
        F.col("col2").alias("qcol2"), "pred_id", F.col("rs_conf").alias("q_conf"),
    )
    j = (
        q.join(lake, "pred_id")
        .filter(F.col("table") != F.col("qtable"))
        .withColumn("score", F.col("q_conf") * F.col("t_conf"))
    )
    return j.groupBy("qtable", "qcol1", "qcol2", "table", "tcol1", "tcol2").agg(
        F.max("score").alias("rm")
    )


def _rel_match_synth(q_synth_rs: DataFrame, pair_overlap: DataFrame) -> DataFrame:
    lake = pair_overlap.select(
        "table", F.col("col1").alias("tcol1"), F.col("col2").alias("tcol2"),
        F.col("ttable").alias("rtable"), F.col("tcol1").alias("rcol1_"),
        F.col("tcol2").alias("rcol2_"), F.col("conf").alias("t_conf"),
    ).withColumnRenamed("rcol1_", "rcol1").withColumnRenamed("rcol2_", "rcol2")
    q = q_synth_rs.select(
        "qtable", "qcol1", "qcol2", "rtable", "rcol1", "rcol2",
        F.col("conf").alias("q_conf"),
    )
    j = (
        q.join(lake, ["rtable", "rcol1", "rcol2"])
        .filter(F.col("table") != F.col("qtable"))
        .withColumn("score", F.col("q_conf") * F.col("t_conf"))
    )
    return j.groupBy("qtable", "qcol1", "qcol2", "table", "tcol1", "tcol2").agg(
        F.max("score").alias("rm")
    )


def _pair_match(rel: DataFrame, colm: DataFrame, with_gs: bool) -> DataFrame:
    """Eq 9: join relMatch with colMatch on both endpoints."""
    c1 = colm.select(
        "qtable", F.col("qcol").alias("qcol1"), "table",
        F.col("tcol").alias("tcol1"), F.col("cm").alias("cm1"),
        *([F.col("gs").alias("gs1")] if with_gs else []),
    )
    c2 = colm.select(
        "qtable", F.col("qcol").alias("qcol2"), "table",
        F.col("tcol").alias("tcol2"), F.col("cm").alias("cm2"),
        *([F.col("gs").alias("gs2")] if with_gs else []),
    )
    out = (
        rel.join(c1, ["qtable", "qcol1", "table", "tcol1"])
        .join(c2, ["qtable", "qcol2", "table", "tcol2"])
        .withColumn("pm", F.col("cm1") * F.col("rm") * F.col("cm2"))
    )
    keep = ["qtable", "qcol1", "qcol2", "table", "tcol1", "tcol2", "pm"]
    if with_gs:
        keep += ["gs1", "gs2"]
    return out.select(*keep)


def _combine_inter_method(pm_kb: DataFrame | None, pm_synth: DataFrame | None) -> DataFrame:
    """Eq 10 across methods (full mode); single-method modes pass one side."""
    if pm_kb is None:
        return pm_synth.select(
            "qtable", "qcol1", "qcol2", "table", "tcol1", "tcol2", "pm"
        )
    if pm_synth is None:
        return pm_kb.select(
            "qtable", "qcol1", "qcol2", "table", "tcol1", "tcol2", "pm"
        )
    keys = ["qtable", "qcol1", "qcol2", "table", "tcol1", "tcol2"]
    a = pm_kb.select(*keys, F.col("pm").alias("pm_kb"), "gs1", "gs2")
    b = pm_synth.select(*keys, F.col("pm").alias("pm_synth"))
    j = a.join(b, keys, "full_outer")
    unbiased = F.coalesce(
        F.col("pm_kb") / (F.col("gs1") * F.col("gs2")), F.lit(0.0)
    )
    pm = F.when(
        unbiased >= F.coalesce(F.col("pm_synth"), F.lit(0.0)),
        F.coalesce(F.col("pm_kb"), F.lit(0.0)),
    ).otherwise(F.coalesce(F.col("pm_synth"), F.lit(0.0)))
    return j.withColumn("pm", pm).select(*keys, "pm")


def _combine_col_inter_method(cm_kb: DataFrame | None, cm_synth: DataFrame | None) -> DataFrame:
    keys = ["qtable", "qcol", "table", "tcol"]
    if cm_kb is None:
        return cm_synth.select(*keys, "cm")
    if cm_synth is None:
        return cm_kb.select(*keys, "cm")
    a = cm_kb.select(*keys, F.col("cm").alias("cm_kb"), "gs")
    b = cm_synth.select(*keys, F.col("cm").alias("cm_synth"))
    j = a.join(b, keys, "full_outer")
    unbiased = F.coalesce(F.col("cm_kb") / F.col("gs"), F.lit(0.0))
    cm = F.when(
        unbiased >= F.coalesce(F.col("cm_synth"), F.lit(0.0)),
        F.coalesce(F.col("cm_kb"), F.lit(0.0)),
    ).otherwise(F.coalesce(F.col("cm_synth"), F.lit(0.0)))
    return j.withColumn("cm", cm).select(*keys, "cm")


def _query_trees(
    queries: list[tuple[str, int]],
    q_kb_rs: DataFrame | None,
    q_synth_rs: DataFrame | None,
) -> dict[str, QueryTree]:
    """Build per-query semantic trees from the union of RS edges found by
    the enabled methods (Sec 7.4)."""
    pairs: dict[str, set[tuple[int, int]]] = {q: set() for q, _ in queries}
    if q_kb_rs is not None:
        for r in q_kb_rs.select("table", "col1", "col2").distinct().collect():
            if r.table in pairs:
                pairs[r.table].add((r.col1, r.col2))
    if q_synth_rs is not None:
        for r in q_synth_rs.select("qtable", "qcol1", "qcol2").distinct().collect():
            if r.qtable in pairs:
                pairs[r.qtable].add((r.qcol1, r.qcol2))
    return {
        q: build_query_tree(intent, pairs[q]) for q, intent in queries
    }


def run_queries(
    spark: SparkSession,
    index: SantosIndex,
    cells: DataFrame,
    queries: list[tuple[str, int]],
    k: int,
    *,
    variant: str = "full",
    min_pm: float = 1e-9,
) -> dict[str, list[tuple[str, float]]]:
    """Online phase (Sec 7.4) for a batch of query tables.

    Returns ``{query_table: [(lake_table, score), ...]}`` ranked
    descending, at most ``k`` entries, self-matches excluded. Queries
    with no discoverable semantics return empty lists (they count as
    misses under the paper's P@k convention).
    """
    assert variant in VARIANTS, variant
    use_kb = variant in ("kb", "full", "col") and index.has_kb()
    use_synth = variant in ("synth", "full", "col") and index.has_synth()
    assert use_kb or use_synth, f"index mode {index.mode} can't serve {variant}"

    qnames = [q for q, _ in queries]
    q_cells = cells.filter(F.col("table").isin(qnames))

    # Query-side frames are referenced by several downstream actions
    # (tree construction + final collect); persist them so query
    # annotation runs once (the paper's query phase also annotates once).
    scratch: list[DataFrame] = []

    def pin(df: DataFrame) -> DataFrame:
        df = df.persist()
        scratch.append(df)
        return df

    def finish(result):
        for df in scratch:
            df.unpersist()
        return result

    q_kb_cs = q_kb_rs = cm_kb = None
    q_synth_cs = q_synth_rs = cm_synth = None
    if use_kb:
        q_kb_cs = pin(kb_method.column_semantics(spark, q_cells, index.kb))
        cm_kb = pin(_col_match_kb(q_kb_cs, index.frames["kb_cs"]))
        if variant != "col":
            q_kb_rs = pin(kb_method.relationship_semantics(spark, q_cells, index.kb))
    if use_synth:
        q_colvals = synth_method.column_values(q_cells)
        q_synth_cs = pin(
            synth_method.query_column_conf(q_colvals, index.frames["colvals"])
        )
        cm_synth = pin(_col_match_synth(q_synth_cs, index.frames["col_overlap"]))
        if variant != "col":
            q_pairs = string_pairs(q_cells).distinct()
            q_synth_rs = pin(
                synth_method.query_pair_conf(q_pairs, index.frames["pair_dict"])
            )

    if variant == "col":
        combined = _combine_col_inter_method(
            cm_kb if use_kb else None, cm_synth if use_synth else None
        )
        rows = combined.filter(F.col("cm") > min_pm).collect()
        per_qt: dict[tuple[str, str], dict[tuple[int, int], float]] = {}
        for r in rows:
            per_qt.setdefault((r.qtable, r.table), {})[(r.qcol, r.tcol)] = r.cm
        scores: dict[str, list[tuple[str, float]]] = {q: [] for q in qnames}
        for (q, t), cms in per_qt.items():
            s = greedy_bipartite_sum(cms)
            if s > 0:
                scores[q].append((t, s))
        return finish({
            q: sorted(lst, key=lambda x, _q=q: (-x[1], rank_tiebreak(_q, x[0])))[:k]
            for q, lst in scores.items()
        })

    trees = _query_trees(queries, q_kb_rs, q_synth_rs)
    # Restrict query pairs to tree edges (both orientations) to bound work.
    edge_rows = [
        (q, u, v) for q, tr in trees.items() for (u, v) in tr.edges
    ] + [
        (q, v, u) for q, tr in trees.items() for (u, v) in tr.edges
    ]
    if not edge_rows:
        return finish({q: [] for q in qnames})
    edges_df = spark.createDataFrame(edge_rows, ["qtable", "qcol1", "qcol2"])

    pm_kb = pm_synth = None
    if use_kb and q_kb_rs is not None:
        q_rs_tree = q_kb_rs.join(
            edges_df,
            (q_kb_rs.table == edges_df.qtable)
            & (q_kb_rs.col1 == edges_df.qcol1)
            & (q_kb_rs.col2 == edges_df.qcol2),
            "left_semi",
        )
        rel = _rel_match_kb(q_rs_tree, index.frames["kb_rs"])
        pm_kb = _pair_match(rel, cm_kb, with_gs=True)
    if use_synth and q_synth_rs is not None:
        q_rs_tree = q_synth_rs.join(edges_df, ["qtable", "qcol1", "qcol2"], "left_semi")
        rel = _rel_match_synth(q_rs_tree, index.frames["pair_overlap"])
        pm_synth = _pair_match(rel, cm_synth, with_gs=False)

    if pm_kb is None and pm_synth is None:
        return finish({q: [] for q in qnames})
    combined = _combine_inter_method(pm_kb, pm_synth)
    pm = _flip_normalize(combined).filter(F.col("pm") > min_pm)
    rows = pm.collect()

    per_qt2: dict[tuple[str, str], dict[tuple[int, int, int, int], float]] = {}
    for r in rows:
        per_qt2.setdefault((r.qtable, r.table), {})[
            (r.qcol1, r.qcol2, r.tcol1, r.tcol2)
        ] = r.pm
    scores2: dict[str, list[tuple[str, float]]] = {q: [] for q in qnames}
    for (q, t), pair_scores in per_qt2.items():
        s = match_tree(trees[q], pair_scores)
        if s > 0:
            scores2[q].append((t, s))
    return finish({
        q: sorted(lst, key=lambda x, _q=q: (-x[1], rank_tiebreak(_q, x[0])))[:k]
        for q, lst in scores2.items()
    })
