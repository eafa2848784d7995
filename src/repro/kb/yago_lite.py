"""YAGO-lite: a synthetic knowledge base with YAGO-4-like shape.

SANTOS reads five things from YAGO (Sec 7.1): label -> entity, entity ->
leaf types, the ISA hierarchy (with a single root whose direct children
are the "top-level" types), per-type entity counts (driving the
granularity score of Eq 2), and value-pair -> predicate lookups. This
module materializes all of them synthetically with YAGO-calibrated
magnitudes: ``stat_count`` per type mirrors YAGO statistics (place ~6M,
city ~42K, as in Example 14) while the number of *materialized* entity
instances stays small enough for a laptop-scale lake.

Triples are functional per (subject, predicate): each subject has exactly
one object for a given predicate. This matches the FD-based notion of a
"meaningful relationship" in Sec 7.2 and keeps generated lake tables
FD-consistent by construction.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.kb.schema import ROOT, granularity_score

# (type_name, parent_name, stat_count). Parents must precede children.
HIERARCHY: list[tuple[str, str, int]] = [
    ("person", ROOT, 2_000_000),
    ("place", ROOT, 6_000_000),
    ("organization", ROOT, 1_000_000),
    ("creative_work", ROOT, 3_000_000),
    ("product", ROOT, 500_000),
    ("event", ROOT, 300_000),
    ("species", ROOT, 400_000),
    ("intangible", ROOT, 2_000_000),
    # place
    ("administrative_area", "place", 1_200_000),
    ("city", "administrative_area", 42_000),
    ("state", "administrative_area", 3_000),
    ("country", "administrative_area", 300),
    ("park", "place", 15_000),
    ("facility", "place", 500_000),
    ("hospital", "facility", 30_000),
    ("school", "facility", 200_000),
    ("airport", "facility", 15_000),
    ("landform", "place", 800_000),
    ("river", "landform", 120_000),
    ("mountain", "landform", 200_000),
    # person
    ("artist", "person", 300_000),
    ("actor", "artist", 80_000),
    ("musician", "artist", 120_000),
    ("politician", "person", 60_000),
    ("athlete", "person", 400_000),
    ("civil_servant", "person", 20_000),
    # creative_work
    ("movie", "creative_work", 250_000),
    ("music_album", "creative_work", 400_000),
    ("book", "creative_work", 1_000_000),
    # organization
    ("company", "organization", 300_000),
    ("government_agency", "organization", 40_000),
    ("sports_team", "organization", 60_000),
    # product
    ("vehicle", "product", 50_000),
    ("food", "product", 30_000),
    # event
    ("festival", "event", 20_000),
    ("sports_event", "event", 50_000),
    # species
    ("bird", "species", 11_000),
    ("fish", "species", 30_000),
    ("tree", "species", 60_000),
    ("mammal", "species", 6_000),
    # intangible
    ("award", "intangible", 10_000),
]

# Materialized entity instances per leaf (or mid-level) type.
ENTITY_COUNTS: dict[str, int] = {
    "country": 60, "state": 120, "city": 1_200, "park": 500,
    "hospital": 250, "school": 250, "airport": 120, "river": 150,
    "mountain": 150, "actor": 600, "musician": 500, "politician": 300,
    "athlete": 600, "civil_servant": 400, "movie": 900,
    "music_album": 400, "book": 300, "company": 400,
    "government_agency": 120, "sports_team": 90, "vehicle": 100,
    "food": 100, "festival": 200, "sports_event": 100, "bird": 150,
    "fish": 150, "tree": 150, "mammal": 100, "award": 80,
}

# (pred_name, pair_count_stat, [(subj_type, obj_type), ...]).
PREDICATES: list[tuple[str, int, list[tuple[str, str]]]] = [
    ("located_in", 5_000_000, [
        ("park", "city"), ("city", "country"), ("state", "country"),
        ("hospital", "city"), ("school", "city"), ("airport", "city"),
        ("river", "country"), ("mountain", "country"),
    ]),
    ("led_by", 40_000, [("park", "civil_servant"), ("government_agency", "politician")]),
    ("works_in", 100_000, [("civil_servant", "city")]),
    ("born_in", 1_500_000, [
        ("actor", "city"), ("musician", "city"), ("politician", "city"),
        ("athlete", "city"), ("civil_servant", "city"),
    ]),
    ("directed_by", 240_000, [("movie", "actor")]),
    ("produced_by", 350_000, [("music_album", "musician")]),
    ("screens", 20_000, [("park", "movie")]),
    ("plays_for", 380_000, [("athlete", "sports_team")]),
    ("found_in", 90_000, [("bird", "state"), ("fish", "state"), ("tree", "state"), ("mammal", "state")]),
    ("operated_by", 150_000, [("hospital", "government_agency"), ("school", "government_agency")]),
    ("held_in", 18_000, [("festival", "city")]),
    ("hq_in", 280_000, [("company", "city")]),
    ("ceo", 120_000, [("company", "politician")]),
    ("wrote", 700_000, [("book", "actor")]),
]

_HOMOGRAPH_RATE = 0.02  # fraction of movie labels duplicated onto albums

_SYL = ["ba", "ben", "cor", "dan", "el", "far", "gan", "hol", "is", "jor",
        "kel", "lan", "mor", "nel", "or", "per", "quin", "ras", "sol",
        "tor", "ul", "ver", "wes", "xan", "yor", "zel"]
_SUFFIX = {
    "city": ["ton", "ville", "ford", "burg", "field"],
    "country": ["ia", "land", "stan"],
    "state": [" state", " province"],
    "park": [" park", " gardens", " commons"],
    "hospital": [" hospital", " medical center"],
    "school": [" school", " academy"],
    "airport": [" airport"],
    "river": [" river"],
    "mountain": [" peak", " mountain"],
    "company": [" corp", " ltd", " inc"],
    "government_agency": [" agency", " bureau", " dept"],
    "sports_team": [" fc", " united", " rovers"],
    "festival": [" festival", " fair"],
    "sports_event": [" open", " cup"],
    "award": [" award", " prize"],
}
_PERSON_TYPES = {"actor", "musician", "politician", "athlete", "civil_servant"}


def _make_label(g: np.random.Generator, type_name: str) -> str:
    stem = "".join(g.choice(_SYL) for _ in range(int(g.integers(2, 4))))
    if type_name in _PERSON_TYPES:
        last = "".join(g.choice(_SYL) for _ in range(2))
        return f"{stem.capitalize()} {last.capitalize()}"
    suffixes = _SUFFIX.get(type_name)
    if suffixes is not None:
        return f"{stem.capitalize()}{g.choice(suffixes)}"
    return f"{stem.capitalize()} {''.join(g.choice(_SYL) for _ in range(2))}"


@dataclass
class KB:
    """In-memory YAGO-lite with pandas frames + dict-based fast paths.

    The pandas frames are the ground truth; ``to_spark`` lifts them for
    the distributed indexing joins (cached per SparkSession).
    """

    types: pd.DataFrame          # type_id, type_name, parent_id, top_id, depth, stat_count, gs
    ancestors: pd.DataFrame      # type_id, anc_id  (reflexive, excludes root)
    labels: pd.DataFrame         # label, entity_id
    entity_types: pd.DataFrame   # entity_id, type_id
    triples: pd.DataFrame        # subj_id, pred_id, obj_id
    predicates: pd.DataFrame     # pred_id, pred_name, pair_count
    _caches: dict = field(default_factory=dict, repr=False)

    # ---- python-side convenience (used by the lake generator & tests) ----
    def _index(self) -> dict:
        if "idx" not in self._caches:
            tid = dict(zip(self.types.type_name, self.types.type_id))
            ents_by_type: dict[str, list[int]] = {}
            tname = dict(zip(self.types.type_id, self.types.type_name))
            for e, t in zip(self.entity_types.entity_id, self.entity_types.type_id):
                ents_by_type.setdefault(tname[t], []).append(int(e))
            label_of = {}
            for lab, e in zip(self.labels.label, self.labels.entity_id):
                label_of.setdefault(int(e), lab)  # first label = canonical
            pid = dict(zip(self.predicates.pred_name, self.predicates.pred_id))
            trip = {
                (int(s), int(p)): int(o)
                for s, p, o in zip(self.triples.subj_id, self.triples.pred_id, self.triples.obj_id)
            }
            self._caches["idx"] = {
                "type_id": tid, "type_name": tname, "ents": ents_by_type,
                "label": label_of, "pred_id": pid, "trip": trip,
            }
        return self._caches["idx"]

    def type_id(self, name: str) -> int:
        return self._index()["type_id"][name]

    def entities_of(self, type_name: str) -> list[int]:
        return self._index()["ents"].get(type_name, [])

    def label_of(self, entity_id: int) -> str:
        return self._index()["label"][entity_id]

    def pred_id(self, name: str) -> int:
        return self._index()["pred_id"][name]

    def object_of(self, subj_id: int, pred_name: str) -> int | None:
        return self._index()["trip"].get((subj_id, self.pred_id(pred_name)))

    def gs_of(self, type_name: str) -> float:
        row = self.types[self.types.type_name == type_name]
        return float(row.gs.iloc[0])

    # ---- spark lifting ----
    def to_spark(self, spark):
        """Return dict of cached Spark DataFrames for the KB tables."""
        key = ("spark", id(spark))
        if key not in self._caches:
            frames = {
                "labels": self.labels, "entity_types": self.entity_types,
                "ancestors": self.ancestors, "types": self.types,
                "triples": self.triples, "predicates": self.predicates,
            }
            out = {}
            for name, pdf in frames.items():
                sdf = spark.createDataFrame(pdf)
                sdf = sdf.persist()
                sdf.count()  # materialize once; these are broadcast-sized dims
                out[name] = sdf
            self._caches[key] = out
        return self._caches[key]

    def unpersist(self, spark) -> None:
        key = ("spark", id(spark))
        for sdf in self._caches.pop(key, {}).values():
            sdf.unpersist()

    # ---- derived KBs ----
    def restricted(self, keep_fraction: float, seed: int = 0) -> "KB":
        """Fig 9 sweep: keep ``keep_fraction`` of entities' labels.

        Removing an entity's labels makes it unmappable from the lake,
        which is how the paper "systematically removes portions of the
        existing KB entities that are in the data lake tables".
        """
        g = np.random.default_rng(seed)
        ents = self.labels.entity_id.unique()
        keep = set(ents[g.random(len(ents)) < keep_fraction].tolist())
        return KB(
            types=self.types, ancestors=self.ancestors,
            labels=self.labels[self.labels.entity_id.isin(keep)].reset_index(drop=True),
            entity_types=self.entity_types, triples=self.triples,
            predicates=self.predicates,
        )

    def degraded(self, *, label_keep: float = 0.7, corrupt: float = 0.08,
                 type_keep: float = 0.6, pred_keep: float = 0.7,
                 seed: int = 7) -> "KB":
        """TURL-proxy KB: lossy, noisy view of this KB (DESIGN.md §4).

        Drops ``1-label_keep`` of labels, rewires ``corrupt`` of the
        surviving labels to random entities (wrong-type annotations),
        keeps ``type_keep`` of non-top leaf/mid types and ``pred_keep``
        of predicates — simulating a pre-trained web-table annotator with
        domain shift.
        """
        g = np.random.default_rng(seed)
        lab = self.labels.sample(frac=label_keep, random_state=seed).reset_index(drop=True)
        all_ents = self.entity_types.entity_id.unique()
        flip = g.random(len(lab)) < corrupt
        lab.loc[flip, "entity_id"] = g.choice(all_ents, flip.sum())
        top_ids = set(self.types[self.types.parent_id == -1].type_id)
        non_top = self.types[~self.types.type_id.isin(top_ids)]
        kept_types = set(non_top.sample(frac=type_keep, random_state=seed).type_id) | top_ids
        etypes = self.entity_types[self.entity_types.type_id.isin(kept_types)].reset_index(drop=True)
        anc = self.ancestors[self.ancestors.type_id.isin(kept_types)
                             & self.ancestors.anc_id.isin(kept_types)].reset_index(drop=True)
        preds = self.predicates.sample(frac=pred_keep, random_state=seed)
        trips = self.triples[self.triples.pred_id.isin(set(preds.pred_id))].reset_index(drop=True)
        return KB(types=self.types, ancestors=anc, labels=lab,
                  entity_types=etypes, triples=trips,
                  predicates=preds.reset_index(drop=True))


def build_kb(seed: int = 42) -> KB:
    """Construct the full YAGO-lite KB deterministically from ``seed``."""
    g = np.random.default_rng(seed)

    names = [ROOT] + [t for t, _, _ in HIERARCHY]
    tid = {n: i for i, n in enumerate(names)}
    parent = {ROOT: None}
    stat = {ROOT: 10_000_000}
    for t, p, c in HIERARCHY:
        parent[t] = p
        stat[t] = c

    def top_of(t: str) -> str:
        while parent[t] != ROOT:
            t = parent[t]
        return t

    def depth_of(t: str) -> int:
        d = 0
        while parent[t] is not None:
            t, d = parent[t], d + 1
        return d

    types = pd.DataFrame(
        {
            "type_id": [tid[t] for t, _, _ in HIERARCHY],
            "type_name": [t for t, _, _ in HIERARCHY],
            "parent_id": [tid[p] if p != ROOT else -1 for _, p, _ in HIERARCHY],
            "top_id": [tid[top_of(t)] for t, _, _ in HIERARCHY],
            "depth": [depth_of(t) for t, _, _ in HIERARCHY],
            "stat_count": [stat[t] for t, _, _ in HIERARCHY],
        }
    )
    types["gs"] = types.stat_count.map(granularity_score)

    anc_rows = []
    for t, _, _ in HIERARCHY:
        a = t
        while a != ROOT:
            anc_rows.append((tid[t], tid[a]))
            a = parent[a]
    ancestors = pd.DataFrame(anc_rows, columns=["type_id", "anc_id"])

    # Entities + labels. Labels are unique per type pool by construction,
    # with a controlled homograph injection (movie labels reused on albums).
    ent_rows, lab_rows = [], []
    next_eid = 0
    ents_by_type: dict[str, list[int]] = {}
    labels_by_type: dict[str, list[str]] = {}
    for type_name, n in ENTITY_COUNTS.items():
        seen: set[str] = set()
        ids, labs = [], []
        for _ in range(n):
            lab = _make_label(g, type_name)
            while lab in seen:
                lab = _make_label(g, type_name)
            seen.add(lab)
            eid = next_eid
            next_eid += 1
            ids.append(eid)
            labs.append(lab)
            ent_rows.append((eid, tid[type_name]))
            lab_rows.append((lab, eid))
        ents_by_type[type_name] = ids
        labels_by_type[type_name] = labs
    # Homographs: a movie label also names a distinct music_album entity.
    n_homo = max(1, int(_HOMOGRAPH_RATE * ENTITY_COUNTS["movie"]))
    movie_idx = g.choice(len(ents_by_type["movie"]), n_homo, replace=False)
    album_idx = g.choice(len(ents_by_type["music_album"]), n_homo, replace=False)
    for mi, ai in zip(movie_idx, album_idx):
        lab_rows.append((labels_by_type["movie"][mi], ents_by_type["music_album"][ai]))

    entity_types = pd.DataFrame(ent_rows, columns=["entity_id", "type_id"])
    labels = pd.DataFrame(lab_rows, columns=["label", "entity_id"]).drop_duplicates()

    predicates = pd.DataFrame(
        {
            "pred_id": range(len(PREDICATES)),
            "pred_name": [p for p, _, _ in PREDICATES],
            "pair_count": [c for _, c, _ in PREDICATES],
        }
    )
    trip_rows = []
    for pidx, (_, _, sigs) in enumerate(PREDICATES):
        for subj_t, obj_t in sigs:
            objs = ents_by_type[obj_t]
            for s in ents_by_type[subj_t]:
                # Deterministic functional object choice per (subject, predicate).
                o = objs[(s * 2654435761 + pidx * 40503) % len(objs)]
                trip_rows.append((s, pidx, o))
    triples = pd.DataFrame(trip_rows, columns=["subj_id", "pred_id", "obj_id"])

    return KB(types=types, ancestors=ancestors, labels=labels,
              entity_types=entity_types, triples=triples, predicates=predicates)
