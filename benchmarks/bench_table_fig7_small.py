"""Figure 7 (SMALL block) — D3L vs SANTOS at k=10.

Paper: D3L 0.52/0.58/0.42, SANTOS 0.93/0.90/0.68 (ideal R@10 ~ 0.72).
"""
from benchmarks.conftest import effectiveness_run, write_table
from repro.eval.harness import fig7_rows
from repro.eval.metrics import ideal_recall_at_k

METHODS = ("santos_full", "santos_kb", "santos_synth", "santos_col", "d3l")

PAPER_ROWS = [
    "| SMALL paper (k=10) | D3L | 0.52 | 0.58 | 0.42 |",
    "| SMALL paper (k=10) | SANTOS | 0.93 | 0.90 | 0.68 |",
]


def test_fig7_small(spark, benchmark, small_bench, kb, results_cache):
    res = benchmark.pedantic(
        effectiveness_run, args=(spark, small_bench, kb, METHODS, results_cache),
        rounds=1, iterations=1,
    )
    lines = [
        "# Figure 7 — SMALL block (ours, k=10)",
        "",
        "| Benchmark | Method | MAP@k | P@k | R@k |",
        "|---|---|---|---|---|",
        *fig7_rows("SMALL-lite", small_bench.k, res),
        *PAPER_ROWS,
        "",
        f"Ideal R@{small_bench.k}: "
        f"{ideal_recall_at_k(small_bench.gt_sets(), small_bench.k):.2f} "
        "(paper ideal ~ 0.72)",
    ]
    write_table("fig7_small", lines)

    m = {name: r.metrics for name, r in res.items()}
    assert m["santos_full"]["MAP"] > m["d3l"]["MAP"]
    assert m["santos_full"]["P"] > m["d3l"]["P"]
    assert m["santos_full"]["R"] > m["d3l"]["R"]
    # SMALL's signature (Sec 8.3): the KB had no coverage for many query
    # tables, so Synth > KB here — the reverse of TUS.
    assert m["santos_synth"]["MAP"] > m["santos_kb"]["MAP"]
    # SANTOS_Full stays within a whisker of the best variant.
    best = max(m["santos_kb"]["MAP"], m["santos_synth"]["MAP"])
    assert m["santos_full"]["MAP"] >= best - 0.06
