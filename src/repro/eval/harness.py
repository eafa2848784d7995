"""End-to-end experiment harness: index, query, evaluate, time.

One entry point per paper experiment family:

- :func:`run_benchmark` — Fig 7 effectiveness + Fig 10 timings for any
  subset of {SANTOS_Full, SANTOS_KB, SANTOS_Synth, SANTOS_Col, D3L,
  TURL}. ``per_query_timing=True`` reruns the online phase one query at
  a time to measure the per-query latency distribution (avg / p10 /
  p90) the paper reports; otherwise the online phase is one batched
  dataflow (used for effectiveness sweeps).
- :func:`coverage_sweep` — Fig 9: MAP@k of SANTOS_Full as the fraction
  of KB entities (labels) visible to the pipeline grows from 0 to 1.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import SparkSession

from repro.baselines import d3l as d3l_mod
from repro.baselines import turl_proxy
from repro.core.search import build_index, run_queries
from repro.eval.metrics import evaluate_all
from repro.kb.yago_lite import KB
from repro.lake.generator import Benchmark

ALL_METHODS = ("santos_full", "santos_kb", "santos_synth", "santos_col", "d3l", "turl")


@dataclass
class MethodResult:
    method: str
    metrics: dict[str, float]
    index_seconds: float
    query_seconds: list[float] = field(default_factory=list)
    results: dict[str, list[str]] = field(default_factory=dict)

    def query_stats(self) -> dict[str, float]:
        qs = np.array(self.query_seconds) if self.query_seconds else np.array([0.0])
        return {
            "avg": float(qs.mean()),
            "p10": float(np.percentile(qs, 10)),
            "p90": float(np.percentile(qs, 90)),
        }


def _build_for(spark, bench, kb, method, cells):
    if method in ("santos_full", "santos_col"):
        return build_index(spark, cells, kb, mode="full")
    if method == "santos_kb":
        return build_index(spark, cells, kb, mode="kb")
    if method == "santos_synth":
        return build_index(spark, cells, None, mode="synth")
    if method == "d3l":
        return d3l_mod.build_d3l_index(spark, cells)
    if method == "turl":
        return turl_proxy.build_turl_index(spark, cells, kb)
    raise ValueError(method)


def _query_for(spark, index, cells, queries, k, method):
    if method == "d3l":
        return d3l_mod.run_d3l_queries(spark, index, cells, queries, k)
    if method == "turl":
        return turl_proxy.run_turl_queries(spark, index, cells, queries, k)
    variant = {"santos_full": "full", "santos_kb": "kb",
               "santos_synth": "synth", "santos_col": "col"}[method]
    return run_queries(spark, index, cells, queries, k, variant=variant)


def run_benchmark(
    spark: SparkSession,
    bench: Benchmark,
    kb: KB,
    *,
    methods: tuple[str, ...] = ("santos_full", "d3l"),
    per_query_timing: bool = False,
    shared_indexes: dict | None = None,
) -> dict[str, MethodResult]:
    """Run ``methods`` on ``bench`` and evaluate against its ground truth.

    ``shared_indexes`` (method -> index) lets callers reuse an already
    built index (e.g. ``santos_col`` reuses the ``santos_full`` index —
    same pre-processing, different online scoring).
    """
    cells = bench.spark_cells(spark)
    gt = bench.gt_sets()
    out: dict[str, MethodResult] = {}
    shared_indexes = shared_indexes if shared_indexes is not None else {}
    for method in methods:
        reuse_from = "santos_full" if method == "santos_col" else method
        index = shared_indexes.get(reuse_from)
        owned = index is None
        if index is None:
            index = _build_for(spark, bench, kb, method, cells)
            shared_indexes[reuse_from] = index
            owned = False  # keep in shared_indexes; caller may clean up
        qtimes: list[float] = []
        if per_query_timing:
            results: dict[str, list[tuple[str, float]]] = {}
            for q in bench.queries:
                t0 = time.perf_counter()
                r = _query_for(spark, index, cells, [q], bench.k, method)
                qtimes.append(time.perf_counter() - t0)
                results.update(r)
        else:
            t0 = time.perf_counter()
            results = _query_for(spark, index, cells, bench.queries, bench.k, method)
            qtimes.append(time.perf_counter() - t0)
        ranked = {q: [t for t, _ in lst] for q, lst in results.items()}
        out[method] = MethodResult(
            method=method,
            metrics=evaluate_all(ranked, gt, bench.k),
            index_seconds=index.build_seconds,
            query_seconds=qtimes,
            results=ranked,
        )
    return out


def cleanup_indexes(shared_indexes: dict) -> None:
    for idx in shared_indexes.values():
        idx.unpersist()
    shared_indexes.clear()


def coverage_sweep(
    spark: SparkSession,
    bench: Benchmark,
    kb: KB,
    *,
    fractions: tuple[float, ...] = (0.0, 0.25, 0.5, 0.75, 1.0),
    seed: int = 0,
) -> dict[float, float]:
    """Fig 9: average MAP@k of SANTOS_Full vs existing-KB coverage.

    Fraction 0 disables the KB entirely (pure SANTOS_Synth); fraction 1
    is the full KB. Each point rebuilds the index against the
    label-restricted KB.
    """
    cells = bench.spark_cells(spark)
    gt = bench.gt_sets()
    out: dict[float, float] = {}
    for f in fractions:
        if f <= 0.0:
            index = build_index(spark, cells, None, mode="synth")
            variant = "synth"
        else:
            sub = kb if f >= 1.0 else kb.restricted(f, seed=seed)
            index = build_index(spark, cells, sub, mode="full")
            variant = "full"
        results = run_queries(spark, index, cells, bench.queries, bench.k, variant=variant)
        ranked = {q: [t for t, _ in lst] for q, lst in results.items()}
        out[f] = evaluate_all(ranked, gt, bench.k)["MAP"]
        index.unpersist()
        if f < 1.0 and f > 0.0:
            sub.unpersist(spark)
    return out


# ---------------------------------------------------------------------------
# Table rendering (benchmarks print these; EXPERIMENTS.md records them)
# ---------------------------------------------------------------------------

def fig7_rows(bench_name: str, k: int, results: dict[str, MethodResult],
              with_recall: bool = True) -> list[str]:
    label = {"santos_full": "SANTOS", "santos_kb": "SANTOS_KB",
             "santos_synth": "SANTOS_Synth", "santos_col": "SANTOS_Col",
             "d3l": "D3L", "turl": "TURL"}
    rows = []
    for m, r in results.items():
        rec = f"{r.metrics['R']:.2f}" if with_recall else "-"
        rows.append(
            f"| {bench_name} (k={k}) | {label[m]} | {r.metrics['MAP']:.2f} "
            f"| {r.metrics['P']:.2f} | {rec} |"
        )
    return rows


def fig10_rows(bench_name: str, results: dict[str, MethodResult]) -> list[str]:
    label = {"santos_full": "SANTOS_Full", "santos_kb": "SANTOS_KB",
             "santos_synth": "SANTOS_Synth", "santos_col": "SANTOS_Col",
             "d3l": "D3L", "turl": "TURL"}
    rows = []
    for m, r in results.items():
        qs = r.query_stats()
        rows.append(
            f"| {bench_name} | {label[m]} | {r.index_seconds:.1f} s "
            f"| {qs['avg']:.2f} ({qs['p10']:.2f} – {qs['p90']:.2f}) |"
        )
    return rows
