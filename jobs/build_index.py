"""Build and persist a SANTOS index for a benchmark to parquet.

    spark-submit jobs/build_index.py --bench tus --mode full --out /tmp/idx
"""
import argparse
import sys
import time

sys.path.insert(0, ".")

from jobs._session import get_benchmark, get_spark  # noqa: E402
from repro.core.search import build_index  # noqa: E402
from repro.kb.yago_lite import build_kb  # noqa: E402


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--bench", default="tus", choices=["tus", "small", "large", "mini"])
    ap.add_argument("--mode", default="full", choices=["full", "kb", "synth"])
    ap.add_argument("--out", required=True)
    args = ap.parse_args()

    spark = get_spark(f"santos-index-{args.bench}")
    kb = build_kb() if args.mode != "synth" else None
    bench = get_benchmark(kb or build_kb(), args.bench)
    t0 = time.perf_counter()
    index = build_index(spark, bench.spark_cells(spark), kb, mode=args.mode)
    for name, df in index.frames.items():
        df.write.mode("overwrite").parquet(f"{args.out}/{name}")
    print(
        f"indexed {args.bench} mode={args.mode} "
        f"build={index.build_seconds:.1f}s total={time.perf_counter() - t0:.1f}s "
        f"-> {args.out}"
    )
    spark.stop()


if __name__ == "__main__":
    main()
