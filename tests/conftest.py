"""Shared fixtures for the test suite.

The expensive objects (KB, mini benchmark, built indexes) are
session-scoped so the many Spark-touching tests reuse one set of
persisted frames. The root ``conftest.py`` provides the ``spark``
fixture.
"""
from __future__ import annotations

import pytest

from repro.kb.yago_lite import KB, build_kb
from repro.lake.benchmarks import make_mini
from repro.lake.generator import Benchmark


@pytest.fixture(scope="session")
def kb() -> KB:
    return build_kb()


@pytest.fixture(scope="session")
def mini(kb) -> Benchmark:
    return make_mini(kb)


@pytest.fixture(scope="session")
def mini_cells(spark, mini):
    return mini.spark_cells(spark)


@pytest.fixture(scope="session")
def mini_index_full(spark, mini_cells, kb):
    from repro.core.search import build_index

    idx = build_index(spark, mini_cells, kb, mode="full")
    yield idx
    idx.unpersist()


@pytest.fixture(scope="session")
def mini_d3l_index(spark, mini_cells):
    from repro.baselines.d3l import build_d3l_index

    idx = build_d3l_index(spark, mini_cells)
    yield idx
    idx.unpersist()
