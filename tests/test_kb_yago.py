"""Tests for the YAGO-lite synthetic knowledge base."""
import math

import pytest

from repro.kb.schema import ROOT, granularity_score
from repro.kb.yago_lite import ENTITY_COUNTS, HIERARCHY, PREDICATES, build_kb


@pytest.fixture(scope="module")
def k():
    return build_kb()


class TestGranularityScore:
    def test_example_14_place(self):
        """gs(place) ~ 0.14 for ~6M entities (Example 14)."""
        assert granularity_score(6_000_000) == pytest.approx(1 / math.log10(6e6))
        assert 0.14 < granularity_score(6_000_000) < 0.15

    def test_example_14_city(self):
        assert 0.21 < granularity_score(42_000) < 0.23

    def test_rare_type_clamped(self):
        # Types with < 10 entities: log10 < 1 -> clamp to 1.0.
        assert granularity_score(5) == 1.0
        assert granularity_score(9) == 1.0

    def test_range(self):
        for n in (1, 10, 1000, 10**7):
            assert 0 < granularity_score(n) <= 1.0

    def test_monotone_decreasing(self):
        assert granularity_score(100) > granularity_score(10_000)


class TestHierarchy:
    def test_single_root_children_are_top_levels(self, k):
        tops = k.types[k.types.parent_id == -1]
        expected = {t for t, p, _ in HIERARCHY if p == ROOT}
        assert set(tops.type_name) == expected

    def test_every_parent_exists(self, k):
        ids = set(k.types.type_id)
        for pid in k.types.parent_id:
            assert pid == -1 or pid in ids

    def test_top_id_is_ancestor(self, k):
        anc = k.ancestors.groupby("type_id").anc_id.apply(set).to_dict()
        for _, row in k.types.iterrows():
            assert row.top_id in anc[row.type_id]

    def test_ancestors_reflexive(self, k):
        for tid in k.types.type_id:
            rows = k.ancestors[k.ancestors.type_id == tid]
            assert tid in set(rows.anc_id)

    def test_root_not_in_ancestors(self, k):
        # The KB root is "uninformative" and excluded from CS (Sec 4.1).
        names = dict(zip(k.types.type_id, k.types.type_name))
        for aid in k.ancestors.anc_id:
            assert names[aid] != ROOT

    def test_city_chain(self, k):
        city = k.type_id("city")
        anc_names = {
            dict(zip(k.types.type_id, k.types.type_name))[a]
            for a in k.ancestors[k.ancestors.type_id == city].anc_id
        }
        assert anc_names == {"city", "administrative_area", "place"}

    def test_gs_precomputed(self, k):
        row = k.types[k.types.type_name == "place"].iloc[0]
        assert row.gs == pytest.approx(granularity_score(row.stat_count))

    def test_depth_consistent(self, k):
        d = dict(zip(k.types.type_id, k.types.depth))
        p = dict(zip(k.types.type_id, k.types.parent_id))
        for tid in k.types.type_id:
            if p[tid] != -1:
                assert d[tid] == d[p[tid]] + 1


class TestEntities:
    def test_counts(self, k):
        by_type = k.entity_types.groupby("type_id").size()
        tid = dict(zip(k.types.type_name, k.types.type_id))
        for t, n in ENTITY_COUNTS.items():
            assert by_type[tid[t]] == n

    def test_every_entity_has_label(self, k):
        labeled = set(k.labels.entity_id)
        assert set(k.entity_types.entity_id) <= labeled

    def test_homographs_exist(self, k):
        # Some labels map to more than one entity (Boston-the-city /
        # Boston-the-album in the paper).
        counts = k.labels.groupby("label").entity_id.nunique()
        assert (counts > 1).any()

    def test_homographs_cross_types(self, k):
        tname = dict(zip(k.types.type_id, k.types.type_name))
        etype = dict(zip(k.entity_types.entity_id, k.entity_types.type_id))
        multi = k.labels.groupby("label").entity_id.apply(list)
        multi = multi[multi.apply(len) > 1]
        assert any(
            len({tname[etype[e]] for e in ents}) > 1 for ents in multi
        )

    def test_label_lookup(self, k):
        e = k.entities_of("city")[0]
        assert isinstance(k.label_of(e), str) and k.label_of(e)


class TestTriples:
    def test_functional_per_subject_predicate(self, k):
        dup = k.triples.groupby(["subj_id", "pred_id"]).obj_id.nunique()
        assert (dup == 1).all()

    def test_all_predicates_present(self, k):
        assert set(k.predicates.pred_name) == {p for p, _, _ in PREDICATES}

    def test_object_of(self, k):
        park = k.entities_of("park")[0]
        city = k.object_of(park, "located_in")
        city_types = set(
            k.entity_types[k.entity_types.entity_id == city].type_id
        )
        assert k.type_id("city") in city_types

    def test_object_of_missing(self, k):
        park = k.entities_of("park")[0]
        assert k.object_of(park, "directed_by") is None

    def test_located_in_signatures(self, k):
        # Every city has a located_in country triple.
        pid = k.pred_id("located_in")
        subj = set(k.triples[k.triples.pred_id == pid].subj_id)
        assert set(k.entities_of("city")) <= subj


class TestDerivedKBs:
    def test_restricted_fraction(self, k):
        half = k.restricted(0.5, seed=1)
        frac = half.labels.entity_id.nunique() / k.labels.entity_id.nunique()
        assert 0.4 < frac < 0.6

    def test_restricted_zero(self, k):
        assert len(k.restricted(0.0).labels) == 0

    def test_restricted_full(self, k):
        assert len(k.restricted(1.0).labels) == len(k.labels)

    def test_restricted_keeps_types(self, k):
        half = k.restricted(0.5, seed=1)
        assert len(half.types) == len(k.types)

    def test_degraded_drops_labels(self, k):
        d = k.degraded(label_keep=0.5, seed=3)
        assert len(d.labels) < 0.6 * len(k.labels)

    def test_degraded_corrupts(self, k):
        d = k.degraded(seed=3)
        merged = d.labels.merge(k.labels, on="label", suffixes=("_d", "_o"))
        # Some surviving labels point at different entities than originally.
        mismatch = (merged.entity_id_d != merged.entity_id_o).mean()
        assert mismatch > 0.02

    def test_degraded_keeps_top_levels(self, k):
        d = k.degraded(seed=3)
        tops = set(k.types[k.types.parent_id == -1].type_id)
        kept = set(d.ancestors.anc_id) | set(d.entity_types.type_id)
        # top-level types survive the vocabulary cut
        assert tops & kept

    def test_degraded_fewer_predicates(self, k):
        d = k.degraded(pred_keep=0.5, seed=3)
        assert len(d.predicates) < len(k.predicates)
