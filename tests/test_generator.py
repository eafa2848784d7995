"""Structural invariants of the synthetic data-lake generator."""
import numpy as np
import pandas as pd
import pytest

from repro.kb.schema import CELL_COLUMNS
from repro.lake.benchmarks import (
    PARKS,
    make_mini,
    make_small_lite,
    make_tus_lite,
)
from repro.lake.generator import Domain, Edge, generate_lake


@pytest.fixture(scope="module")
def tus(kb):
    return make_tus_lite(kb)


@pytest.fixture(scope="module")
def small(kb):
    return make_small_lite(kb)


class TestCellsSchema:
    def test_columns(self, mini):
        assert list(mini.cells.columns) == CELL_COLUMNS

    def test_row_ids_dense(self, mini):
        one = mini.cells[mini.cells.table == mini.queries[0][0]]
        n = one.row.max() + 1
        for c in one.col.unique():
            assert len(one[one.col == c]) == n

    def test_is_num_flags(self, mini):
        assert set(mini.cells.is_num.unique()) <= {0, 1}

    def test_numeric_values_parse(self, mini):
        nums = mini.cells[(mini.cells.is_num == 1) & mini.cells.value.notna()]
        pd.to_numeric(nums.value)  # raises on failure

    def test_some_nulls(self, mini):
        assert mini.cells.value.isna().mean() > 0.005

    def test_deterministic(self, kb):
        a = make_mini(kb, seed=5).cells
        b = make_mini(kb, seed=5).cells
        pd.testing.assert_frame_equal(a, b)

    def test_seed_changes_lake(self, kb):
        a = make_mini(kb, seed=5).cells
        b = make_mini(kb, seed=6).cells
        assert not a.equals(b)


class TestQueriesAndGroundTruth:
    def test_queries_are_lake_tables(self, tus):
        tables = set(tus.meta.table)
        for q, _ in tus.queries:
            assert q in tables

    def test_intent_col_is_root(self, tus):
        for q, intent in tus.queries:
            assert intent == 0

    def test_queries_are_full(self, tus):
        # Query tables keep every column of their domain spec.
        meta = tus.meta.set_index("table")
        for q, _ in tus.queries:
            dom = meta.loc[q, "domain"]
            dom_max = tus.meta[tus.meta.domain == dom].n_cols.max()
            assert meta.loc[q, "n_cols"] == dom_max

    def test_gt_same_domain_only(self, tus):
        meta = dict(zip(tus.meta.table, tus.meta.domain))
        for q, t in zip(tus.gt["query"], tus.gt["table"]):
            assert meta[q] == meta[t]

    def test_gt_excludes_self(self, tus):
        assert not (tus.gt["query"] == tus.gt["table"]).any()

    def test_gt_excludes_twins(self, tus):
        meta = dict(zip(tus.meta.table, tus.meta.domain))
        for q, t in zip(tus.gt["query"], tus.gt["table"]):
            assert "twin" not in meta[t] or "twin" in meta[q]

    def test_gt_at_least_k(self, tus):
        sizes = tus.gt.groupby("query").size()
        for q, _ in tus.queries:
            assert sizes[q] >= tus.k

    def test_small_gt_at_least_k(self, small):
        sizes = small.gt.groupby("query").size()
        assert (sizes >= small.k).all()


class TestTwins:
    def test_twin_root_values_disjoint(self, tus):
        """Twin domains share the spec but not root entity values."""
        base = tus.cells[
            (tus.cells.table.str.contains(r"\.parks\.")) & (tus.cells.col == 0)
        ].value.dropna()
        twin = tus.cells[
            (tus.cells.table.str.contains(r"\.parks_twin1\.")) & (tus.cells.col == 0)
        ].value.dropna()
        overlap = set(base) & set(twin)
        # Contaminated cells may coincide; the clean pools are disjoint.
        assert len(overlap) / max(1, len(set(base))) < 0.05

    def test_twin_types_match(self, tus):
        # Twin tables have the same column-name vocabulary (same spec).
        base_names = set(
            tus.cells[tus.cells.table.str.contains(r"\.parks\.")].col_name
        )
        twin_names = set(
            tus.cells[tus.cells.table.str.contains(r"\.parks_twin1\.")].col_name
        )
        core = {n for n in base_names if not n.startswith("col")}
        twin_core = {n for n in twin_names if not n.startswith("col")}
        assert core & twin_core


class TestCoverage:
    def test_benchmark_coverage_in_range(self, tus, kb):
        vals = tus.cells[(tus.cells.is_num == 0) & tus.cells.value.notna()]
        cov = vals.value.isin(set(kb.labels.label)).mean()
        assert 0.3 < cov < 0.75

    def test_starved_domain_unmapped(self, small, kb):
        vals = small.cells[
            small.cells.table.str.contains(r"\.rivers\.")
            & (small.cells.is_num == 0)
            & small.cells.value.notna()
        ]
        cov = vals.value.isin(set(kb.labels.label)).mean()
        assert cov < 0.02

    def test_zero_overlap_queries(self, tus):
        """The last query of each domain shares no root values with
        non-query lake tables of its domain."""
        meta = tus.meta.set_index("table")
        qnames = {q for q, _ in tus.queries}
        by_dom: dict[str, list[str]] = {}
        for q in sorted(qnames):
            by_dom.setdefault(meta.loc[q, "domain"], []).append(q)
        checked = 0
        for dom, qs in by_dom.items():
            zq = qs[-1]  # last query index is the fully-reserved one
            zvals = set(
                tus.cells[(tus.cells.table == zq) & (tus.cells.col == 0)]
                .value.dropna()
            )
            lake = tus.meta[
                (tus.meta.domain == dom) & (~tus.meta.table.isin(qnames))
            ].table
            lvals = set(
                tus.cells[
                    tus.cells.table.isin(set(lake)) & (tus.cells.col == 0)
                ].value.dropna()
            )
            assert len(zvals & lvals) / max(1, len(zvals)) < 0.1
            checked += 1
        assert checked > 0


class TestFunctionalDependencies:
    def test_relational_edges_functional(self, mini):
        """In relational domains, root -> dep is functional per table."""
        meta = mini.meta[mini.meta.relational]
        violations = 0
        checks = 0
        for t in meta.table:
            tbl = mini.cells[mini.cells.table == t]
            wide = tbl.pivot(index="row", columns="col", values="value")
            root = wide[0]
            for c in wide.columns:
                if c == 0 or tbl[tbl.col == c].is_num.iloc[0] == 1:
                    continue
                pair = pd.DataFrame({"r": root, "d": wide[c]}).dropna()
                nd = pair.groupby("r").d.nunique()
                checks += 1
                if (nd > 1).any():
                    violations += 1
        assert checks > 0
        # attr columns (phone/date) are not functional; semantic ones are.
        assert violations < checks

    def test_distractor_pairs_not_functional(self, mini):
        tbl_names = mini.meta[~mini.meta.relational].table
        broken = 0
        for t in tbl_names:
            tbl = mini.cells[mini.cells.table == t]
            wide = tbl.pivot(index="row", columns="col", values="value")
            if wide.shape[1] < 2:
                continue
            pair = pd.DataFrame({"r": wide[0], "d": wide[1]}).dropna()
            if (pair.groupby("r").d.nunique() > 1).any():
                broken += 1
        assert broken > 0


class TestStats:
    def test_stats_keys(self, mini):
        s = mini.stats()
        assert set(s) == {
            "lake_tables", "lake_cols", "lake_rows",
            "query_tables", "query_cols", "query_rows",
        }

    def test_counts_consistent(self, mini):
        s = mini.stats()
        assert s["lake_tables"] == mini.meta.table.nunique()
        assert s["query_tables"] == len({q for q, _ in mini.queries})
        assert s["lake_rows"] > s["query_rows"]

    def test_tus_scale(self, tus):
        s = tus.stats()
        assert 300 < s["lake_tables"] < 600
        assert s["query_tables"] == len(tus.queries) == 24


class TestCustomDomain:
    def test_minimal_domain(self, kb):
        dom = Domain(
            name="toy", root_role="park_name", root_type="park",
            edges=(Edge("park_name", "located_in", "city", "city"),),
        )
        b = generate_lake(
            kb, [dom], tables_per_domain={"toy": 3},
            queries_per_domain={"toy": 1}, k=2, name="t", seed=1,
            rows_range=(10, 15),
        )
        assert b.meta.table.nunique() == 3
        assert len(b.queries) == 1
        assert len(b.gt) == 2

    def test_impurity_zero_is_clean(self, kb):
        b = generate_lake(
            kb, [PARKS], tables_per_domain={"parks": 2},
            queries_per_domain={"parks": 1}, k=1, name="t", seed=1,
            rows_range=(10, 15), impurity=0.0, default_coverage=1.0,
            null_rate=0.0,
        )
        # All root values are genuine parks (KB labels with park type).
        park_labels = {kb.label_of(e) for e in kb.entities_of("park")}
        roots = b.cells[b.cells.col == 0].value
        assert set(roots) <= park_labels
