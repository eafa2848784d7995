"""Figure 6 — Benchmark statistics (lake + query tables/columns/rows)."""
from benchmarks.conftest import write_table

PAPER = {
    "TUS": ("1,530", "14,810", "6.8M", "125", "1,610", "557K"),
    "SMALL": ("550", "6,322", "3.8M", "50", "615", "1.07M"),
    "LARGE": ("11,090", "123,477", "70M", "80", "1,017", "1.03M"),
}


def test_fig6_stats(spark, benchmark, tus_bench, small_bench, large_bench):
    benches = {"TUS": tus_bench, "SMALL": small_bench, "LARGE": large_bench}
    stats = benchmark.pedantic(
        lambda: {n: b.stats() for n, b in benches.items()}, rounds=1, iterations=1
    )
    lines = [
        "# Figure 6 — Benchmark statistics (ours vs paper)",
        "",
        "| Source | lake #T | lake #C | lake #R | query #T | query #C | query #R |",
        "|---|---|---|---|---|---|---|",
    ]
    for name, s in stats.items():
        lines.append(
            f"| {name}-lite (ours) | {s['lake_tables']} | {s['lake_cols']} "
            f"| {s['lake_rows']} | {s['query_tables']} | {s['query_cols']} "
            f"| {s['query_rows']} |"
        )
        p = PAPER[name]
        lines.append(
            f"| {name} (paper) | {p[0]} | {p[1]} | {p[2]} | {p[3]} | {p[4]} | {p[5]} |"
        )
        assert s["lake_tables"] > 0 and s["query_tables"] > 0
    # scale ordering matches the paper: LARGE > TUS > SMALL in lake size.
    assert stats["LARGE"]["lake_tables"] > stats["TUS"]["lake_tables"]
    write_table("fig6_stats", lines)
