"""Shared fixtures for the per-table benchmarks.

Heavy artefacts (KB, the three lakes, the all-method effectiveness runs)
are session-scoped and cached, so each table's bench measures its own
phase without rebuilding the world. Every bench also writes its table to
``results/<name>.md`` so the numbers survive pytest's output capture.
"""
from __future__ import annotations

import pathlib

import pytest

from repro.eval.harness import cleanup_indexes, run_benchmark
from repro.kb.yago_lite import build_kb
from repro.lake.benchmarks import make_large_lite, make_small_lite, make_tus_lite

RESULTS_DIR = pathlib.Path(__file__).resolve().parent.parent / "results"


@pytest.fixture(scope="session")
def kb():
    return build_kb()


@pytest.fixture(scope="session")
def tus_bench(kb):
    return make_tus_lite(kb)


@pytest.fixture(scope="session")
def small_bench(kb):
    return make_small_lite(kb)


@pytest.fixture(scope="session")
def large_bench(kb):
    return make_large_lite(kb)


@pytest.fixture(scope="session")
def results_cache():
    """method-result cache keyed by (bench name); holds the all-method
    effectiveness runs so fig7/fig8 benches share one computation."""
    cache: dict = {"indexes": {}}
    yield cache
    for shared in cache["indexes"].values():
        cleanup_indexes(shared)


def effectiveness_run(spark, bench, kb, methods, cache):
    """Run (or fetch) the batched effectiveness run for a benchmark."""
    key = (bench.name, tuple(sorted(methods)))
    if key not in cache:
        shared = cache["indexes"].setdefault(bench.name, {})
        cache[key] = run_benchmark(
            spark, bench, kb, methods=methods, shared_indexes=shared
        )
    return cache[key]


def write_table(name: str, lines: list[str]) -> pathlib.Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    path = RESULTS_DIR / f"{name}.md"
    path.write_text("\n".join(lines) + "\n")
    print("\n".join(lines))
    return path
