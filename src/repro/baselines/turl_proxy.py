"""TURL baseline proxy — a pre-trained annotator simulated as a noisy KB.

The paper evaluates TURL [8] by treating it "as a KB": TURL annotates
column types (CS) and relations (RS) and the SANTOS indexing/scoring
machinery runs on top. Its poor accuracy on open data is attributed to
web-table domain shift. With no pre-trained model available offline, we
model that annotator as a *degraded KB* (DESIGN.md §4): a fraction of
labels dropped (coverage loss), a fraction rewired to wrong entities
(annotation noise), and a reduced type/predicate vocabulary (web-table
schema bias) — then plug it into the standard SANTOS KB pipeline.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, SparkSession

from repro.core.search import SantosIndex, build_index, run_queries
from repro.kb.yago_lite import KB


def turl_kb(kb: KB, *, seed: int = 7) -> KB:
    """The simulated TURL annotator view of the KB."""
    return kb.degraded(
        label_keep=0.5, corrupt=0.15, type_keep=0.4, pred_keep=0.5, seed=seed
    )


def build_turl_index(
    spark: SparkSession, cells: DataFrame, kb: KB, *, seed: int = 7
) -> SantosIndex:
    return build_index(spark, cells, turl_kb(kb, seed=seed), mode="kb")


def run_turl_queries(
    spark: SparkSession,
    index: SantosIndex,
    cells: DataFrame,
    queries: list[tuple[str, int]],
    k: int,
) -> dict[str, list[tuple[str, float]]]:
    return run_queries(spark, index, cells, queries, k, variant="kb")
