"""D3L-lite: the column-unionability baseline of Bogatu et al. [3].

D3L ranks related tables using five per-column evidence types — attribute
name similarity, value overlap, regular-expression/format similarity,
(word-embedding) distribution similarity and numeric-distribution
similarity — with **no relationship semantics**, which is exactly the
property the paper's comparison isolates. Our reproduction keeps the
evidence family but swaps approximate machinery for exact equivalents at
our scale (DESIGN.md §4):

- value overlap: exact distinct-value Jaccard (instead of LSH),
- embeddings: character-3-gram profile Jaccard (instead of fastText),
- format: character-class pattern histogram cosine,
- names: token Jaccard over column names,
- numeric: closeness of (mean, std) summaries.

The table score is the greedy one-to-one column assignment sum of the
averaged evidence (the bipartite matching D3L/TUS use), so a distractor
table with overlapping columns but different relationships scores as
high as a genuinely unionable one — the designed blind spot.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.window import Window

from repro.core.scoring import greedy_bipartite_sum, rank_tiebreak

_GRAM_VALUE_CAP = 40  # distinct values per column fed into the 3-gram profile


@dataclass
class D3LIndex:
    frames: dict[str, DataFrame]
    build_seconds: float = 0.0
    _persisted: list[DataFrame] = field(default_factory=list, repr=False)

    def unpersist(self) -> None:
        for df in self._persisted:
            df.unpersist()
        self._persisted.clear()


def _strings(cells: DataFrame) -> DataFrame:
    return cells.filter((F.col("is_num") == 0) & F.col("value").isNotNull())


def _colvals(cells: DataFrame) -> DataFrame:
    return _strings(cells).select("table", "col", "value").distinct()


def _name_tokens(cells: DataFrame) -> DataFrame:
    names = cells.select("table", "col", "col_name").distinct()
    return (
        names.select(
            "table", "col",
            F.explode(F.split(F.lower("col_name"), r"[^a-z0-9]+")).alias("token"),
        )
        .filter(F.length("token") > 0)
        .distinct()
    )


def _format_hist(cells: DataFrame) -> DataFrame:
    """Character-class pattern histogram per column (regex evidence)."""
    pat = F.regexp_replace(
        F.regexp_replace(
            F.regexp_replace(F.col("value"), r"[A-Z]+", "A"), r"[a-z]+", "a"
        ),
        r"[0-9]+", "9",
    )
    return (
        _strings(cells).select("table", "col", pat.alias("pattern"))
        .groupBy("table", "col", "pattern")
        .agg(F.count("*").alias("n"))
    )


def _grams(colvals: DataFrame) -> DataFrame:
    """Distinct character 3-grams over a capped sample of column values
    (the embedding-proxy evidence)."""
    sampled = (
        colvals.withColumn(
            "_rk",
            F.row_number().over(
                Window.partitionBy("table", "col").orderBy("value")
            ),
        )
        .filter(F.col("_rk") <= _GRAM_VALUE_CAP)
        .drop("_rk")
    )
    v = F.lower(F.col("value"))
    idx = F.sequence(F.lit(1), F.greatest(F.length(v) - 2, F.lit(1)))
    return (
        sampled.select("table", "col", F.explode(idx).alias("i"), v.alias("v"))
        .select("table", "col", F.substring("v", F.col("i"), F.lit(3)).alias("gram"))
        .filter(F.length("gram") == 3)
        .distinct()
    )


def _numeric_stats(cells: DataFrame) -> DataFrame:
    nums = cells.filter(
        (F.col("is_num") == 1) & F.col("value").isNotNull()
    ).withColumn("x", F.col("value").cast("double"))
    return nums.groupBy("table", "col").agg(
        F.mean("x").alias("mu"), F.stddev_pop("x").alias("sd")
    )


def build_d3l_index(spark: SparkSession, cells: DataFrame) -> D3LIndex:
    """Offline phase: five evidence profiles, one scan family each."""
    t0 = time.perf_counter()
    colvals = _colvals(cells)
    frames = {
        "colvals": colvals,
        "col_sizes": colvals.groupBy("table", "col").agg(
            F.count("*").alias("size")
        ),
        "names": _name_tokens(cells),
        "formats": _format_hist(cells),
        "grams": _grams(colvals),
        "gram_sizes": None,  # filled below
        "numerics": _numeric_stats(cells),
    }
    frames["gram_sizes"] = frames["grams"].groupBy("table", "col").agg(
        F.count("*").alias("gsize")
    )
    persisted = []
    for name, df in frames.items():
        df = df.persist()
        df.count()
        frames[name] = df
        persisted.append(df)
    return D3LIndex(
        frames=frames, build_seconds=time.perf_counter() - t0, _persisted=persisted
    )


def _jaccard(q: DataFrame, lake: DataFrame, key: str, qsz: DataFrame, tsz: DataFrame,
             qsz_col: str, tsz_col: str) -> DataFrame:
    """Generic distinct-set Jaccard between query and lake columns."""
    inter = (
        q.join(lake, key)
        .filter(F.col("table") != F.col("qtable"))
        .groupBy("qtable", "qcol", "table", "tcol")
        .agg(F.count("*").alias("inter"))
    )
    return (
        inter.join(qsz, ["qtable", "qcol"]).join(tsz, ["table", "tcol"])
        .withColumn(
            "sim",
            F.col("inter")
            / (F.col(qsz_col) + F.col(tsz_col) - F.col("inter")),
        )
        .select("qtable", "qcol", "table", "tcol", "sim")
    )


def run_d3l_queries(
    spark: SparkSession,
    index: D3LIndex,
    cells: DataFrame,
    queries: list[tuple[str, int]],
    k: int,
) -> dict[str, list[tuple[str, float]]]:
    """Online phase: evidence joins against every lake column profile,
    averaged per (query col, lake col), greedy bipartite table score."""
    qnames = [q for q, _ in queries]
    q_cells = cells.filter(F.col("table").isin(qnames))
    fr = index.frames

    def q_side(df: DataFrame, cols: list[str]) -> DataFrame:
        return df.select(
            F.col("table").alias("qtable"), F.col("col").alias("qcol"), *cols
        )

    scratch: list[DataFrame] = []

    def pin(df: DataFrame) -> DataFrame:
        df = df.persist()
        scratch.append(df)
        return df

    q_colvals = pin(_colvals(q_cells))
    q_sizes = q_colvals.groupBy("table", "col").agg(F.count("*").alias("qsize"))
    tsz = fr["col_sizes"].select("table", F.col("col").alias("tcol"), "size")
    sims = []

    sims.append(  # value overlap
        _jaccard(
            q_side(q_colvals, ["value"]),
            fr["colvals"].select("table", F.col("col").alias("tcol"), "value"),
            "value",
            q_side(q_sizes, ["qsize"]), tsz, "qsize", "size",
        ).withColumn("evidence", F.lit("value"))
    )
    q_names = pin(_name_tokens(q_cells))
    qn_sizes = q_names.groupBy("table", "col").agg(F.count("*").alias("qsize"))
    tn_sizes = fr["names"].groupBy("table", "col").agg(F.count("*").alias("size"))
    sims.append(
        _jaccard(
            q_side(q_names, ["token"]),
            fr["names"].select("table", F.col("col").alias("tcol"), "token"),
            "token",
            q_side(qn_sizes, ["qsize"]),
            tn_sizes.select("table", F.col("col").alias("tcol"), "size"),
            "qsize", "size",
        ).withColumn("evidence", F.lit("name"))
    )
    q_grams = pin(_grams(q_colvals))
    qg_sizes = q_grams.groupBy("table", "col").agg(F.count("*").alias("qsize"))
    sims.append(
        _jaccard(
            q_side(q_grams, ["gram"]),
            fr["grams"].select("table", F.col("col").alias("tcol"), "gram"),
            "gram",
            q_side(qg_sizes, ["qsize"]),
            fr["gram_sizes"].select("table", F.col("col").alias("tcol"),
                                    F.col("gsize").alias("size")),
            "qsize", "size",
        ).withColumn("evidence", F.lit("gram"))
    )
    # Format histogram cosine.
    q_fmt = pin(_format_hist(q_cells))
    qf = q_side(q_fmt, ["pattern", "n"]).withColumnRenamed("n", "qn")
    tf = fr["formats"].select(
        "table", F.col("col").alias("tcol"), "pattern", F.col("n").alias("tn")
    )
    dot = (
        qf.join(tf, "pattern")
        .filter(F.col("table") != F.col("qtable"))
        .groupBy("qtable", "qcol", "table", "tcol")
        .agg(F.sum(F.col("qn") * F.col("tn")).alias("dot"))
    )
    qnorm = qf.groupBy("qtable", "qcol").agg(
        F.sqrt(F.sum(F.col("qn") * F.col("qn"))).alias("qnorm")
    )
    tnorm = tf.groupBy("table", "tcol").agg(
        F.sqrt(F.sum(F.col("tn") * F.col("tn"))).alias("tnorm")
    )
    sims.append(
        dot.join(qnorm, ["qtable", "qcol"]).join(tnorm, ["table", "tcol"])
        .withColumn("sim", F.col("dot") / (F.col("qnorm") * F.col("tnorm")))
        .select("qtable", "qcol", "table", "tcol", "sim")
        .withColumn("evidence", F.lit("format"))
    )
    # Numeric summary closeness (cross join: numeric columns are few).
    q_num = pin(_numeric_stats(q_cells))
    if q_num.count() > 0:
        qn = q_side(q_num, ["mu", "sd"]).withColumnRenamed("mu", "qmu").withColumnRenamed("sd", "qsd")
        tn = fr["numerics"].select(
            "table", F.col("col").alias("tcol"),
            F.col("mu").alias("tmu"), F.col("sd").alias("tsd"),
        )
        d = (
            F.abs(F.col("qmu") - F.col("tmu"))
            / (F.greatest(F.abs(F.col("qmu")), F.abs(F.col("tmu")), F.lit(1e-9)))
            + F.abs(F.col("qsd") - F.col("tsd"))
            / (F.greatest(F.col("qsd"), F.col("tsd"), F.lit(1e-9)))
        )
        sims.append(
            qn.crossJoin(tn)
            .filter(F.col("table") != F.col("qtable"))
            .withColumn("sim", 1.0 / (1.0 + d))
            .select("qtable", "qcol", "table", "tcol", "sim")
            .withColumn("evidence", F.lit("numeric"))
        )

    allsims = sims[0]
    for s in sims[1:]:
        allsims = allsims.unionByName(s)
    combined = (
        allsims.groupBy("qtable", "qcol", "table", "tcol")
        .agg(F.mean("sim").alias("u"))
        .filter(F.col("u") > 1e-6)
    )
    rows = combined.collect()
    for df in scratch:
        df.unpersist()

    per_qt: dict[tuple[str, str], dict[tuple[int, int], float]] = {}
    for r in rows:
        per_qt.setdefault((r.qtable, r.table), {})[(r.qcol, r.tcol)] = r.u
    out: dict[str, list[tuple[str, float]]] = {q: [] for q in qnames}
    for (q, t), cms in per_qt.items():
        s = greedy_bipartite_sum(cms)
        if s > 0:
            out[q].append((t, s))
    return {
        q: sorted(lst, key=lambda x, _q=q: (-x[1], rank_tiebreak(_q, x[0])))[:k] for q, lst in out.items()
    }
