"""Run table union search methods on a benchmark and print Fig 7 / Fig 10
style rows.

    spark-submit jobs/run_benchmark.py --bench tus \
        --methods santos_full,d3l [--per-query]
"""
import argparse
import sys

sys.path.insert(0, ".")  # allow running from the repo root without install

from jobs._session import get_benchmark, get_spark  # noqa: E402
from repro.eval.harness import (  # noqa: E402
    cleanup_indexes,
    fig7_rows,
    fig10_rows,
    run_benchmark,
)
from repro.kb.yago_lite import build_kb  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--bench", default="tus", choices=["tus", "small", "large", "mini"])
    ap.add_argument("--methods", default="santos_full,d3l")
    ap.add_argument("--per-query", action="store_true")
    args = ap.parse_args()

    spark = get_spark(f"santos-{args.bench}")
    kb = build_kb()
    bench = get_benchmark(kb, args.bench)
    shared: dict = {}
    try:
        res = run_benchmark(
            spark, bench, kb,
            methods=tuple(args.methods.split(",")),
            per_query_timing=args.per_query,
            shared_indexes=shared,
        )
        print("| Benchmark | Method | MAP@k | P@k | R@k |")
        for row in fig7_rows(args.bench, bench.k, res, with_recall=args.bench != "large"):
            print(row)
        print("| Benchmark | Method | Indexing | Query (s) |")
        for row in fig10_rows(args.bench, res):
            print(row)
    finally:
        cleanup_indexes(shared)
        spark.stop()


if __name__ == "__main__":
    main()
