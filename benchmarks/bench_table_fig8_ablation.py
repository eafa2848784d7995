"""Figure 8 endpoints / Sec 8.2–8.3 ablation — SANTOS variants.

Quoted paper numbers: on TUS, SANTOS_Col has MAP@60 = 0.65 and
P@60 = 0.62 (comparable to D3L); SANTOS_Synth alone reaches MAP 0.68 on
TUS and 0.81 on SMALL; SANTOS_Full is best everywhere; on SMALL the KB
had no coverage for 14/50 queries so SANTOS_KB trails SANTOS_Synth.
This bench re-reports the cached Fig 7 runs as the ablation table.
"""
from benchmarks.conftest import effectiveness_run, write_table
from repro.eval.metrics import evaluate_all

TUS_METHODS = ("santos_full", "santos_kb", "santos_synth", "santos_col", "d3l", "turl")
SMALL_METHODS = ("santos_full", "santos_kb", "santos_synth", "santos_col", "d3l")

PAPER = [
    "| TUS paper (k=60) | SANTOS_Col | 0.65 | 0.62 |",
    "| TUS paper (k=60) | SANTOS_Synth | 0.68 | ~ |",
    "| TUS paper (k=60) | SANTOS_Full | 0.80 | 0.70 |",
    "| SMALL paper (k=10) | SANTOS_Synth | 0.81 | ~ |",
    "| SMALL paper (k=10) | SANTOS_Full | 0.93 | 0.90 |",
]


def test_fig8_ablation(spark, benchmark, tus_bench, small_bench, kb, results_cache):
    tus = effectiveness_run(spark, tus_bench, kb, TUS_METHODS, results_cache)
    small = effectiveness_run(spark, small_bench, kb, SMALL_METHODS, results_cache)

    # The measured phase: re-scoring the cached rankings (the ablation
    # itself reuses Fig 7's runs, as in the paper's shared experiments).
    def rescore():
        out = {}
        for name, bench, res in (("TUS-lite", tus_bench, tus),
                                 ("SMALL-lite", small_bench, small)):
            gt = bench.gt_sets()
            out[name] = {
                m: evaluate_all(r.results, gt, bench.k) for m, r in res.items()
            }
        return out

    scores = benchmark.pedantic(rescore, rounds=1, iterations=1)

    lines = [
        "# Figure 8 / Sec 8.2-8.3 — ablation (ours)",
        "",
        "| Benchmark | Variant | MAP@k | P@k |",
        "|---|---|---|---|",
    ]
    for bench_name, per_method in scores.items():
        for m, met in per_method.items():
            lines.append(
                f"| {bench_name} | {m} | {met['MAP']:.2f} | {met['P']:.2f} |"
            )
    lines += PAPER
    write_table("fig8_ablation", lines)

    t, s = scores["TUS-lite"], scores["SMALL-lite"]
    # Full is the best SANTOS variant on both benchmarks (within noise).
    for variant in ("santos_kb", "santos_col"):
        assert t["santos_full"]["MAP"] >= t[variant]["MAP"] - 0.02
        assert s["santos_full"]["MAP"] >= s[variant]["MAP"] - 0.02
    # The benchmark-specific reversal: KB >= Synth on TUS, Synth > KB on SMALL.
    assert t["santos_kb"]["MAP"] >= t["santos_synth"]["MAP"] - 0.05
    assert s["santos_synth"]["MAP"] > s["santos_kb"]["MAP"]
