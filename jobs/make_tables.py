"""Regenerate any evaluation table outside pytest.

    spark-submit jobs/make_tables.py --table fig7_tus
    spark-submit jobs/make_tables.py --table fig9

Tables: fig5, fig6, fig7_tus, fig7_small, fig7_large, fig8, fig9, fig10.
These drive the same harness code as benchmarks/bench_table_*.py; the
pytest-benchmark variants additionally time and assert the paper shape.
"""
import argparse
import sys

sys.path.insert(0, ".")

from jobs._session import get_benchmark, get_spark  # noqa: E402
from repro.eval.harness import (  # noqa: E402
    cleanup_indexes,
    coverage_sweep,
    fig7_rows,
    run_benchmark,
)
from repro.kb.yago_lite import build_kb  # noqa: E402


def fig5(spark, kb):
    from repro.core.fd import unary_fds
    from repro.core.synth_method import (
        pair_dictionary, pair_overlap_matrix, pair_sizes, pair_values,
    )
    from tests.test_synth_method import FIG2, _cells_from_tables

    cells = _cells_from_tables(spark, FIG2)
    pv = pair_values(cells, unary_fds(cells))
    d = pair_dictionary(pv, pair_overlap_matrix(pv, pair_sizes(pv))).toPandas()
    print(d[(d.rcol1 == 0) & (d.rcol2 == 1)].sort_values(["v1", "rtable"]).to_string())


def fig6(spark, kb):
    for name in ("tus", "small", "large"):
        print(name, get_benchmark(kb, name).stats())


def _fig7(spark, kb, name, methods):
    bench = get_benchmark(kb, name)
    shared: dict = {}
    try:
        res = run_benchmark(spark, bench, kb, methods=methods, shared_indexes=shared)
        for row in fig7_rows(name, bench.k, res):
            print(row)
    finally:
        cleanup_indexes(shared)


def fig9(spark, kb):
    for name in ("tus", "small"):
        bench = get_benchmark(kb, name)
        print(name, coverage_sweep(spark, bench, kb))


TABLES = {
    "fig5": fig5,
    "fig6": fig6,
    "fig7_tus": lambda s, k: _fig7(
        s, k, "tus",
        ("santos_full", "santos_kb", "santos_synth", "santos_col", "d3l", "turl"),
    ),
    "fig7_small": lambda s, k: _fig7(
        s, k, "small", ("santos_full", "santos_kb", "santos_synth", "santos_col", "d3l"),
    ),
    "fig7_large": lambda s, k: _fig7(s, k, "large", ("santos_full", "d3l")),
    "fig8": lambda s, k: (_fig7(
        s, k, "tus", ("santos_full", "santos_kb", "santos_synth", "santos_col"),
    ), _fig7(
        s, k, "small", ("santos_full", "santos_kb", "santos_synth", "santos_col"),
    )),
    "fig9": fig9,
    "fig10": lambda s, k: print(
        "run: pytest benchmarks/bench_table_fig10_times.py --benchmark-only"
    ),
}


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--table", required=True, choices=sorted(TABLES))
    args = ap.parse_args()
    spark = get_spark(f"santos-{args.table}")
    try:
        TABLES[args.table](spark, build_kb())
    finally:
        spark.stop()


if __name__ == "__main__":
    main()
