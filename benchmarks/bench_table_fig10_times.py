"""Figure 10 — indexing and query times.

Paper shape: D3L indexes ~3x faster than SANTOS (the synthesized KB,
with its FD mining and pair dictionary, dominates SANTOS indexing), but
SANTOS answers queries faster — increasingly so as the lake grows (3x on
TUS, ~6x on LARGE) because it probes semantic inverted indexes while D3L
scans five evidence indexes over every column.

Each method's index is built *fresh* (previous persisted frames are
dropped first so Spark's plan cache cannot transfer work between
methods), then the online phase runs one query at a time over a sample
of queries to measure the latency distribution.
"""
import time

import numpy as np

from benchmarks.conftest import write_table
from repro.baselines.d3l import build_d3l_index, run_d3l_queries
from repro.core.search import build_index, run_queries
from repro.eval.harness import cleanup_indexes

N_SAMPLE_QUERIES = 8

PAPER_ROWS = [
    "| TUS paper | D3L | 1h21m | 54.1 (20.5 - 97.3) |",
    "| TUS paper | SANTOS_Full | 4h26m | 22.9 (1.7 - 48.6) |",
    "| TUS paper | SANTOS_KB | 1h38m | 6.1 (0.7 - 13.9) |",
    "| TUS paper | SANTOS_Synth | 3h45m | 15.6 (0.7 - 43.2) |",
    "| SMALL paper | D3L | 17m | 22.4 (7.4 - 43.3) |",
    "| SMALL paper | SANTOS_Full | 4h46m | 28.2 (0.8 - 102) |",
    "| SMALL paper | SANTOS_KB | 1h8m | 10.0 (0.3 - 33.6) |",
    "| SMALL paper | SANTOS_Synth | 3h41m | 18.2 (0.5 - 98.6) |",
    "| LARGE paper | D3L | 7h7m | 177 (13.0 - 325.0) |",
    "| LARGE paper | SANTOS_Full | 21h59m | 35.8 (0.21 - 57.2) |",
]


def _time_method(spark, bench, kb, method):
    cells = bench.spark_cells(spark)
    if method == "d3l":
        index = build_d3l_index(spark, cells)
        run_one = lambda q: run_d3l_queries(spark, index, cells, [q], bench.k)
    else:
        mode = {"santos_full": "full", "santos_kb": "kb", "santos_synth": "synth"}[method]
        index = build_index(spark, cells, None if mode == "synth" else kb, mode=mode)
        run_one = lambda q: run_queries(
            spark, index, cells, [q], bench.k, variant=mode
        )
    qtimes = []
    for q in bench.queries[:N_SAMPLE_QUERIES]:
        t0 = time.perf_counter()
        run_one(q)
        qtimes.append(time.perf_counter() - t0)
    build_s = index.build_seconds
    index.unpersist()
    return build_s, qtimes


def test_fig10_times(spark, benchmark, tus_bench, small_bench, large_bench, kb,
                     results_cache):
    # Drop any index persisted by earlier benches so every build below is
    # cold (Spark reuses cached results for identical plans otherwise).
    for shared in results_cache["indexes"].values():
        cleanup_indexes(shared)

    plan = [
        ("TUS-lite", tus_bench, ["d3l", "santos_kb", "santos_synth", "santos_full"]),
        ("SMALL-lite", small_bench, ["d3l", "santos_kb", "santos_synth", "santos_full"]),
        ("LARGE-lite", large_bench, ["d3l", "santos_full"]),
    ]

    def run_all():
        out = {}
        for name, bench, methods in plan:
            for m in methods:
                out[(name, m)] = _time_method(spark, bench, kb, m)
        return out

    timings = benchmark.pedantic(run_all, rounds=1, iterations=1)

    label = {"d3l": "D3L", "santos_full": "SANTOS_Full",
             "santos_kb": "SANTOS_KB", "santos_synth": "SANTOS_Synth"}
    lines = [
        "# Figure 10 — indexing and query times "
        f"(ours; per-query over first {N_SAMPLE_QUERIES} queries)",
        "",
        "| Benchmark | Method | Indexing | Query s: avg (p10 - p90) |",
        "|---|---|---|---|",
    ]
    for (name, m), (build_s, qt) in timings.items():
        qs = np.array(qt)
        lines.append(
            f"| {name} | {label[m]} | {build_s:.1f} s "
            f"| {qs.mean():.2f} ({np.percentile(qs, 10):.2f} - "
            f"{np.percentile(qs, 90):.2f}) |"
        )
    lines += PAPER_ROWS
    write_table("fig10_times", lines)

    # Shape assertions (loose — wall-clock on a shared box is noisy):
    for name in ("TUS-lite", "SMALL-lite", "LARGE-lite"):
        d3l_build = timings[(name, "d3l")][0]
        full_build = timings[(name, "santos_full")][0]
        # SANTOS indexing is the slow side, as in the paper.
        assert full_build > d3l_build, name
    # SANTOS_Full indexing is heavier than either single-source index.
    assert timings[("TUS-lite", "santos_full")][0] >= 0.8 * max(
        timings[("TUS-lite", "santos_kb")][0],
        timings[("TUS-lite", "santos_synth")][0],
    )
