"""Benchmark configurations: TUS-lite, SMALL-lite, LARGE-lite.

Scaled-down analogues of the paper's three benchmarks (Fig 6), built
with the generator in :mod:`repro.lake.generator`. Scaling and the
per-benchmark knobs (KB coverage, confusable-domain density) are
documented in DESIGN.md §4; paper-vs-ours statistics are recorded by the
Fig 6 harness in EXPERIMENTS.md.
"""
from __future__ import annotations

from repro.kb.yago_lite import KB
from repro.lake.generator import Benchmark, Domain, Edge, generate_lake

# ---------------------------------------------------------------------------
# Domain catalog. Relational domains pair columns through KB predicates;
# distractor domains reuse the same value pools without consistent
# relationships (Ex 1's "birthplaces" and Sec 8.2's "accidents" patterns).
# ---------------------------------------------------------------------------

PARKS = Domain(
    name="parks", root_role="park_name", root_type="park",
    edges=(
        Edge("park_name", "located_in", "city", "city"),
        Edge("park_name", "led_by", "supervisor", "civil_servant"),
        Edge("city", "located_in", "country", "country"),
    ),
    attrs=("phone", "year"),
)
PARK_FILMS = Domain(
    name="park_films", root_role="park_name", root_type="park",
    edges=(
        Edge("park_name", "screens", "film_title", "movie"),
        Edge("park_name", "located_in", "park_city", "city"),
        Edge("film_title", "directed_by", "film_director", "actor"),
    ),
    attrs=("date",),
)
BIRTHPLACES = Domain(  # confusable with CIVIL_SERVANTS (same people, same cities pool)
    name="birthplaces", root_role="person", root_type="civil_servant",
    edges=(
        Edge("person", "born_in", "birthplace", "city"),
        Edge("birthplace", "located_in", "country", "country"),
    ),
    attrs=("year",),
)
CIVIL_SERVANTS = Domain(
    name="civil_servants", root_role="person", root_type="civil_servant",
    edges=(
        Edge("person", "works_in", "city", "city"),
        Edge("city", "located_in", "country", "country"),
    ),
    attrs=("year",),
)
ALBUMS = Domain(
    name="albums", root_role="album", root_type="music_album",
    edges=(Edge("album", "produced_by", "artist", "musician"),),
    attrs=("year",),
)
ATHLETES = Domain(
    name="athletes", root_role="athlete", root_type="athlete",
    edges=(
        Edge("athlete", "plays_for", "team", "sports_team"),
        Edge("athlete", "born_in", "hometown", "city"),
    ),
    attrs=("year",),
)
BIRDS = Domain(
    name="bird_sightings", root_role="animal_scientific_name", root_type="bird",
    edges=(Edge("animal_scientific_name", "found_in", "county_name", "state"),),
    attrs=("year", "amount"),
)
FISH = Domain(
    name="fish_sightings", root_role="animal_scientific_name", root_type="fish",
    edges=(Edge("animal_scientific_name", "found_in", "county_name", "state"),),
    attrs=("year", "amount"),
)
TREES = Domain(
    name="tree_survey", root_role="species_name", root_type="tree",
    edges=(Edge("species_name", "found_in", "county_name", "state"),),
    attrs=("year", "amount"),
)
HOSPITALS = Domain(
    name="hospitals", root_role="hospital", root_type="hospital",
    edges=(
        Edge("hospital", "located_in", "city", "city"),
        Edge("hospital", "operated_by", "operator", "government_agency"),
    ),
    attrs=("phone",),
)
FESTIVALS = Domain(  # confusable with PARKS via (city, country)
    name="festivals", root_role="festival", root_type="festival",
    edges=(
        Edge("festival", "held_in", "city", "city"),
        Edge("city", "located_in", "country", "country"),
    ),
    attrs=("date",),
)
COMPANIES = Domain(
    name="companies", root_role="company", root_type="company",
    edges=(
        Edge("company", "hq_in", "city", "city"),
        Edge("company", "ceo", "ceo_name", "politician"),
    ),
    attrs=("amount",),
)
SCHOOLS = Domain(
    name="schools", root_role="school", root_type="school",
    edges=(
        Edge("school", "located_in", "city", "city"),
        Edge("school", "operated_by", "district", "government_agency"),
    ),
    attrs=("score",),
)
MOVIES = Domain(  # confusable with PARK_FILMS via (film, director)
    name="movies_catalog", root_role="film_title", root_type="movie",
    edges=(Edge("film_title", "directed_by", "director", "actor"),),
    attrs=("year",),
)
AIRPORTS = Domain(
    name="airports", root_role="airport", root_type="airport",
    edges=(Edge("airport", "located_in", "city", "city"),),
    attrs=("code",),
)
RIVERS = Domain(
    name="rivers", root_role="river", root_type="river",
    edges=(Edge("river", "located_in", "country", "country"),),
    attrs=("amount",),
)

# Attribute-only distractors (relational=False: random pairings).
ACCIDENTS = Domain(
    name="accidents", root_role="county", root_type="city",
    extra_cols=(("severity_code", "city"),), attrs=("year", "amount"),
    relational=False,
)
PHONEBOOK = Domain(
    name="phone_directory", root_role="person", root_type="civil_servant",
    attrs=("phone",), relational=False,
)
BUDGETS = Domain(
    name="budgets", root_role="agency", root_type="government_agency",
    attrs=("amount", "year"), relational=False,
)
WEATHER = Domain(
    name="weather", root_role="city", root_type="city",
    attrs=("date", "amount"), relational=False,
)
EXAMS = Domain(
    name="exam_results", root_role="school", root_type="school",
    attrs=("score", "year"), relational=False,
)
VEHICLES = Domain(
    name="vehicle_registry", root_role="vehicle", root_type="vehicle",
    extra_cols=(("owner", "civil_servant"),), attrs=("code",),
    relational=False,
)
INSPECTIONS = Domain(
    name="food_inspections", root_role="venue", root_type="company",
    extra_cols=(("city", "city"),), attrs=("score", "date"),
    relational=False,
)
AWARDS = Domain(
    name="awards_list", root_role="award", root_type="award",
    extra_cols=(("winner", "actor"),), attrs=("year",), relational=False,
)
LIBRARY = Domain(
    name="library_catalog", root_role="book", root_type="book",
    extra_cols=(("author", "actor"),), attrs=("year",), relational=False,
)
TRAFFIC = Domain(
    name="traffic_counts", root_role="city", root_type="city",
    attrs=("amount", "year", "date"), relational=False,
)

# Wide distractors for the LARGE regime: many common-type columns
# (county/person/agency) plus year/amount attributes. These match a
# query on several columns at once under column-only scoring — the
# paper's "emergency hospital admissions" tables that D3L ranks above
# true unionable tables — while sharing no consistent relationship.
ADMISSIONS_W = Domain(
    name="hospital_admissions", root_role="county", root_type="city",
    extra_cols=(("patient", "civil_servant"), ("provider", "government_agency")),
    attrs=("year", "amount", "date"), relational=False,
)
PERMITS_W = Domain(
    name="building_permits", root_role="city", root_type="city",
    extra_cols=(("applicant", "civil_servant"), ("contractor", "company")),
    attrs=("year", "amount", "code"), relational=False,
)
GRANTS_W = Domain(
    name="grants", root_role="agency", root_type="government_agency",
    extra_cols=(("recipient", "company"), ("county", "city"), ("state", "state")),
    attrs=("year", "amount"), relational=False,
)
CENSUS_W = Domain(
    name="census_rows", root_role="county", root_type="city",
    extra_cols=(("state", "state"), ("official", "civil_servant")),
    attrs=("year", "amount", "score"), relational=False,
)


def _with_coverage(dom: Domain, coverage: float) -> Domain:
    from dataclasses import replace
    return replace(dom, coverage=coverage)


def _twinned(dom: Domain, n_slices: int = 2) -> tuple[Domain, list[Domain]]:
    """Split a domain into ``n_slices`` same-spec domains over disjoint
    entity slices (same types, same relationships, no shared values).
    Twins are non-unionable doppelgangers the KB method alone cannot
    reject — the mechanism behind SANTOS's residual errors on TUS
    (tables from different seeds with near-identical relationship
    semantics). Returns (base domain, [twin domains])."""
    from dataclasses import replace
    base = replace(dom, pool_slice=(0, n_slices))
    twins = [
        replace(dom, name=f"{dom.name}_twin{i}", pool_slice=(i, n_slices))
        for i in range(1, n_slices)
    ]
    return base, twins


def make_tus_lite(kb: KB, seed: int = 11) -> Benchmark:
    """TUS analogue: 6 relationship seeds queried, extra lake-only topics.

    Paper: 1,530 lake tables / 125 queries / k=60 (ideal R@60 ~= 0.62).
    Ours: ~292 tables / 24 queries / k=20 (31 unionable per query, ideal
    R@20 ~= 0.65).
    """
    rel, twins = [], []
    # Two of the six queried seeds are KB-starved (coverage ~0.08): their
    # queries lean entirely on the synthesized KB, which the TUS regime's
    # low query-value-overlap only partially supports — these queries
    # produce SANTOS's partial failures, as in the paper.
    for base in (PARKS, PARK_FILMS, BIRTHPLACES, ALBUMS,
                 _with_coverage(ATHLETES, 0.08), _with_coverage(BIRDS, 0.08)):
        a, bs = _twinned(base, n_slices=2)
        rel.append(a)
        twins.extend(bs)
    lake_only = [CIVIL_SERVANTS, HOSPITALS]
    distract = [ACCIDENTS, PHONEBOOK, BUDGETS]
    tables = {d.name: 32 for d in rel}
    tables.update({d.name: 16 for d in twins})
    tables.update({d.name: 20 for d in lake_only + distract})
    return generate_lake(
        kb, rel + twins + lake_only + distract,
        tables_per_domain=tables,
        queries_per_domain={d.name: 4 for d in rel},
        k=20, name="tus", seed=seed, default_coverage=0.55,
        rows_range=(40, 110), query_overlap=0.3, query_zero_frac=0.3,
        impurity=0.05, pool_factor=6, window_factor=1.15,
    )


def make_small_lite(kb: KB, seed: int = 23) -> Benchmark:
    """SANTOS SMALL analogue: many domains, several with ~zero KB coverage.

    Paper: 550 tables / 50 queries / k=10, KB had no coverage for 14/50
    queries. Ours: ~264 tables / 24 queries / k=10, 4 of 12 queried
    domains generated at coverage 0.02 (8/24 queries KB-starved).
    """
    uncovered = [_with_coverage(d, 0.0) for d in (FESTIVALS, SCHOOLS, TREES, RIVERS)]
    rel_base = [PARKS, PARK_FILMS, BIRTHPLACES, CIVIL_SERVANTS, ALBUMS,
                ATHLETES, HOSPITALS, COMPANIES] + uncovered
    # Mild twin pressure on half the queried domains (same-schema tables
    # from "other portals") — the residual-error source for all methods.
    rel, twins = [], []
    for i, d in enumerate(rel_base):
        if i % 4 == 0:
            a, bs = _twinned(d, n_slices=2)
            rel.append(a)
            twins.extend(bs)
        else:
            rel.append(d)
    distract = [ACCIDENTS, PHONEBOOK, BUDGETS, WEATHER, EXAMS, VEHICLES]
    tables = {d.name: 16 for d in rel}
    tables.update({d.name: 6 for d in twins})
    tables.update({d.name: 12 for d in distract})
    return generate_lake(
        kb, rel + twins + distract,
        tables_per_domain=tables,
        queries_per_domain={d.name: 2 for d in rel},
        k=10, name="small", seed=seed, default_coverage=0.6,
        rows_range=(50, 140), query_overlap=0.6, cell_noise=0.01,
    )


def make_large_lite(kb: KB, seed: int = 37, scale: float = 1.0) -> Benchmark:
    """SANTOS LARGE analogue: big lake, heavy confusable/distractor mass,
    lower KB coverage — precision-focused (no recall labels in the paper).

    Paper: 11,090 tables / 80 queries / k=20. Ours: ~1,050 tables /
    28 queries / k=20. ``scale`` shrinks table counts for tests.
    """
    rel_base = [PARKS, PARK_FILMS, BIRTHPLACES, CIVIL_SERVANTS, ALBUMS,
                ATHLETES, BIRDS, FISH, HOSPITALS, COMPANIES, MOVIES,
                # KB-starved seeds (proprietary vocabularies).
                _with_coverage(TREES, 0.0), _with_coverage(FESTIVALS, 0.0),
                _with_coverage(SCHOOLS, 0.0)]
    rel, twins = [], []
    for d in rel_base:
        a, bs = _twinned(d, n_slices=2)
        rel.append(a)
        twins.extend(bs)
    lake_only = [AIRPORTS, RIVERS]
    distract = [ACCIDENTS, PHONEBOOK, BUDGETS, WEATHER, EXAMS, VEHICLES,
                INSPECTIONS, AWARDS, LIBRARY, TRAFFIC]
    wide = [ADMISSIONS_W, PERMITS_W, GRANTS_W, CENSUS_W]
    tables = {d.name: max(4, int(36 * scale)) for d in rel}
    tables.update({d.name: max(3, int(10 * scale)) for d in twins})
    tables.update({d.name: max(3, int(24 * scale)) for d in lake_only})
    tables.update({d.name: max(3, int(50 * scale)) for d in distract})
    tables.update({d.name: max(3, int(60 * scale)) for d in wide})
    return generate_lake(
        kb, rel + twins + lake_only + distract + wide,
        tables_per_domain=tables,
        queries_per_domain={d.name: 2 for d in rel},
        k=20, name="large", seed=seed, default_coverage=0.45,
        rows_range=(40, 100), query_overlap=0.35, query_zero_frac=0.5,
        vertical_keep=(0.45, 0.55, 0.7), name_noise=(0.4, 0.5),
    )


def make_mini(kb: KB, seed: int = 5) -> Benchmark:
    """Tiny lake for unit/integration tests: 3 relational + 2 distractor
    domains, a handful of tables each."""
    rel = [PARKS, BIRTHPLACES, ALBUMS]
    distract = [ACCIDENTS, PHONEBOOK]
    tables = {d.name: 6 for d in rel}
    tables.update({d.name: 4 for d in distract})
    return generate_lake(
        kb, rel + distract,
        tables_per_domain=tables,
        queries_per_domain={d.name: 2 for d in rel},
        k=4, name="mini", seed=seed, default_coverage=0.7,
        rows_range=(25, 45),
    )
