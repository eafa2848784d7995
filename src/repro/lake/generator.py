"""Synthetic open-data lake generator with relationship ground truth.

A *domain* is a root entity type plus a relationship tree (e.g. park
-ledBy-> person, park -locatedIn-> city -locatedIn-> country). Tables of
a domain are horizontal/vertical partitions over a shared pool of root
entities — the same construction recipe the TUS and SANTOS benchmarks
use ("partitioned the annotated tables horizontally and vertically").
Two tables are unionable iff they come from the same domain, which makes
the ground truth *relationship-based*: confusable domains share column
value pools (same cities, people, years) but pair them under different
relationships, so column-only methods see high attribute unionability
for tables the relationship-based ground truth rejects — exactly the
failure mode of Ex 1 / the county-accidents example in Sec 8.2.

Values mix KB entity labels (fraction = ``coverage``) with *surrogate*
entities unknown to the KB but functionally consistent (surrogate
subjects map to deterministic surrogate objects), so the synthesized-KB
pathway has real signal where the curated KB has none — mirroring the
42%/34% YAGO coverage the paper measures on open data.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.kb.yago_lite import KB, ENTITY_COUNTS


@dataclass(frozen=True)
class Edge:
    """One relationship column: ``src_role -pred-> dst_role:dst_type``."""

    src_role: str
    pred: str
    dst_role: str
    dst_type: str


@dataclass(frozen=True)
class Domain:
    """A table topic: root column + relationship tree + extra attributes.

    ``relational=False`` marks attribute-only distractor topics: their
    semantic columns are drawn independently per row (no consistent
    relationship, broken FDs) even though the *values* come from the same
    pools as relational domains.
    """

    name: str
    root_role: str
    root_type: str
    edges: tuple[Edge, ...] = ()
    extra_cols: tuple[tuple[str, str], ...] = ()   # (role, type) for distractors
    attrs: tuple[str, ...] = ()                    # year|amount|phone|date|score|code
    relational: bool = True
    coverage: float | None = None                  # None -> benchmark default
    # (index, n_slices): restrict the root entity pool to a disjoint slice
    # of the type's pool. Two domains with the same spec but different
    # slices are "twins": identical column types AND relationships but
    # disjoint entities — distinguishable only through value evidence,
    # like same-schema tables from different open-data portals. Ground
    # truth treats twins as non-unionable (different seeds).
    pool_slice: tuple[int, int] | None = None


@dataclass
class Benchmark:
    """A generated lake: melted cells + metadata + queries + ground truth."""

    name: str
    cells: pd.DataFrame          # table, col, col_name, row, value, is_num
    meta: pd.DataFrame           # table, domain, relational, n_rows, n_cols, intent_col
    queries: list[tuple[str, int]]   # (table, intent col position)
    gt: pd.DataFrame             # query, table  (unionable pairs, self excluded)
    k: int
    _caches: dict = field(default_factory=dict, repr=False)

    def spark_cells(self, spark):
        key = ("cells", id(spark))
        if key not in self._caches:
            sdf = spark.createDataFrame(self.cells).persist()
            sdf.count()
            self._caches[key] = sdf
        return self._caches[key]

    def gt_sets(self) -> dict[str, set[str]]:
        out: dict[str, set[str]] = {}
        for q, t in zip(self.gt["query"], self.gt["table"]):
            out.setdefault(q, set()).add(t)
        return out

    def stats(self) -> dict:
        """Fig 6-style statistics for lake and query tables."""
        per_table = self.cells.groupby("table").agg(
            n_cols=("col", "nunique"), n_rows=("row", "nunique"))
        qnames = {q for q, _ in self.queries}
        lake, qt = per_table, per_table.loc[sorted(qnames)]
        return {
            "lake_tables": int(len(lake)), "lake_cols": int(lake.n_cols.sum()),
            "lake_rows": int(lake.n_rows.sum()),
            "query_tables": int(len(qt)), "query_cols": int(qt.n_cols.sum()),
            "query_rows": int(qt.n_rows.sum()),
        }


_ATTR_SYNONYMS = {
    "year": ["year", "yr", "fiscal_year"],
    "amount": ["amount", "total", "value_usd"],
    "phone": ["phone", "telephone", "contact"],
    "date": ["date", "recorded_on", "as_of"],
    "score": ["score", "rating", "points"],
    "code": ["code", "ref", "id_code"],
}
_NUM_ATTRS = {"year", "amount", "score"}


_CONTAM_TYPES = ["city", "civil_servant", "movie", "company", "state"]


class _World:
    """Pools of KB + surrogate entities shared across a benchmark.

    Surrogate entities get negative ids; their labels are type-prefixed
    so value overlap only happens within a type pool (as with real
    entities), and their functional objects are deterministic in
    (subject, predicate) so FDs hold and value-pair overlap across tables
    is real.

    ``impurity`` models dirty open data: for a deterministic fraction of
    (subject, predicate) pairs the related object is a wrong-type
    contaminant, and a small fraction of pool entities are themselves
    wrong-type. Contamination is *functional* (consistent per subject),
    so unary FDs still hold — what varies is how cleanly each column
    maps to KB types, which is what gives per-table confidence variance
    (and therefore honest, non-tied rankings).
    """

    def __init__(self, kb: KB, seed: int, impurity: float = 0.0):
        self.kb = kb
        self.g = np.random.default_rng(seed)
        self.impurity = impurity
        self._sur_pool: dict[str, list[int]] = {}
        self._sur_label: dict[int, str] = {}
        self._sur_type: dict[int, str] = {}
        self._type_idx: dict[str, int] = {}

    def _contaminant(self, h: int, avoid_type: str, coverage: float = 0.5) -> int:
        """Wrong-type dirty value. Contaminants are KB entities only in
        proportion to the domain's coverage, so a KB-starved domain stays
        KB-starved (its dirt is as unmappable as its data)."""
        types = [t for t in _CONTAM_TYPES if t != avoid_type] or _CONTAM_TYPES
        t = types[h % len(types)]
        kb_pool = self.kb.entities_of(t)
        sur_pool = self.surrogates(t)
        use_kb = ((h // 7) % 1000) / 1000 < coverage and kb_pool
        pool = kb_pool if use_kb else sur_pool
        return int(pool[(h // 13) % len(pool)])

    def surrogates(self, type_name: str) -> list[int]:
        if type_name not in self._sur_pool:
            ti = self._type_idx.setdefault(type_name, len(self._type_idx) + 1)
            n = max(40, ENTITY_COUNTS.get(type_name, 100) // 2)
            ids = [-(ti * 1_000_000 + i) for i in range(n)]
            self._sur_pool[type_name] = ids
            for i, sid in enumerate(ids):
                self._sur_label[sid] = f"{type_name}-x{i:04d}"
                self._sur_type[sid] = type_name
        return self._sur_pool[type_name]

    def label(self, eid: int) -> str:
        return self._sur_label[eid] if eid < 0 else self.kb.label_of(eid)

    def object_of(self, eid: int, pred: str, dst_type: str,
                  coverage: float = 0.5) -> int:
        """Functional object for relationship value generation."""
        h = abs(eid) * 2654435761 + (hash(pred) % 100_003) * 97
        if self.impurity > 0 and (h % 10_000) / 10_000 < self.impurity:
            return self._contaminant(h, dst_type, coverage)
        if eid >= 0:
            obj = self.kb.object_of(eid, pred)
            if obj is not None:
                return obj
        pool = self.surrogates(dst_type)
        return pool[h % len(pool)]

    def pool(
        self, type_name: str, size: int, coverage: float, seed: int,
        pool_slice: tuple[int, int] | None = None,
    ) -> list[int]:
        """Sample a mixed KB/surrogate entity pool for one domain role."""
        g = np.random.default_rng(seed)
        kb_ents = self.kb.entities_of(type_name)
        if pool_slice is not None:
            i, n = pool_slice
            kb_ents = kb_ents[i::n]  # deterministic disjoint slices
        n_kb = min(len(kb_ents), int(round(size * coverage)))
        chosen = list(g.choice(kb_ents, n_kb, replace=False)) if n_kb else []
        sur = self.surrogates(type_name)
        if pool_slice is not None:
            i, n = pool_slice
            sur = sur[i::n]
        n_sur = min(len(sur), size - n_kb)
        chosen += list(g.choice(sur, n_sur, replace=False)) if n_sur else []
        out = [int(e) for e in chosen]
        g.shuffle(out)  # interleave KB/surrogate so pool windows mix both
        # Pool-level impurity: a few entries are wrong-type entities
        # (dirty cells that recur within the domain's tables).
        if self.impurity > 0:
            n_bad = int(round(len(out) * self.impurity / 2))
            for i in g.choice(len(out), n_bad, replace=False):
                out[int(i)] = self._contaminant(
                    int(g.integers(1 << 30)), type_name, coverage
                )
        return out


def _attr_value(g: np.random.Generator, kind: str) -> str:
    if kind == "year":
        return str(int(g.integers(1990, 2024)))
    if kind == "amount":
        return str(round(float(g.random() * 100_000), 2))
    if kind == "phone":
        return f"555-{int(g.integers(0, 10_000)):04d}"
    if kind == "date":
        return f"{int(g.integers(1990, 2024))}-{int(g.integers(1, 13)):02d}-{int(g.integers(1, 29)):02d}"
    if kind == "score":
        return str(round(float(g.random() * 100), 1))
    if kind == "code":
        return f"{chr(65 + int(g.integers(0, 26)))}{chr(65 + int(g.integers(0, 26)))}-{int(g.integers(0, 10_000)):04d}"
    raise ValueError(kind)


def _col_name(
    g: np.random.Generator, role: str, idx: int,
    name_noise: tuple[float, float] = (0.08, 0.15),
) -> str:
    # Metadata is noisy in lakes: sometimes a generic placeholder name,
    # sometimes a portal-specific variant. ``name_noise`` = (placeholder
    # probability, variant probability) — higher in messier lakes.
    if g.random() < name_noise[0]:
        return f"col{idx}"
    if g.random() < name_noise[1]:
        return f"{role}_{int(g.integers(0, 10))}"
    return role


def generate_lake(
    kb: KB,
    domains: list[Domain],
    *,
    tables_per_domain: dict[str, int],
    queries_per_domain: dict[str, int],
    k: int,
    name: str,
    seed: int = 0,
    default_coverage: float = 0.7,
    rows_range: tuple[int, int] = (40, 120),
    pool_factor: int = 4,
    window_factor: float = 1.6,
    null_rate: float = 0.04,
    query_overlap: float = 0.5,
    query_zero_frac: float = 0.0,
    impurity: float = 0.08,
    cell_noise: float = 0.0,
    vertical_keep: tuple[float, float, float] = (0.6, 0.7, 0.85),
    name_noise: tuple[float, float] = (0.08, 0.15),
) -> Benchmark:
    """Generate a benchmark lake.

    The first ``queries_per_domain[d]`` tables of each relational domain
    are forced *full* (all columns present) and become the query tables,
    with the root column as the intent column. Ground truth: all other
    tables of the same domain.

    ``query_overlap`` controls how much of a query table's rows come from
    the pool region the lake tables draw from; the rest come from a
    query-reserved pool slice no lake table uses. Low values starve
    value-overlap evidence for queries (the TUS regime, where the
    synthesized KB "is not able to retrieve enough results"), high
    values make value evidence plentiful (the SMALL regime).
    ``query_zero_frac`` makes that fraction of each domain's query tables
    draw *all* rows from the reserved slice: those queries share no
    values with any lake table, so purely value-based retrieval returns
    nothing for them — the paper's "SANTOS_Synth was not able to
    retrieve enough results for all the query tables" failure mode.
    """
    g = np.random.default_rng(seed)
    world = _World(kb, seed + 1, impurity=impurity)
    cells_parts: list[pd.DataFrame] = []
    meta_rows, queries, gt_rows = [], [], []
    tables_by_domain: dict[str, list[str]] = {}

    for d_i, dom in enumerate(domains):
        coverage = default_coverage if dom.coverage is None else dom.coverage
        n_tables = tables_per_domain[dom.name]
        n_queries = queries_per_domain.get(dom.name, 0) if dom.relational else 0
        rows_lo, rows_hi = rows_range
        pool_size = pool_factor * (rows_lo + rows_hi) // 2
        root_pool = world.pool(
            dom.root_type, pool_size, coverage, seed * 7919 + d_i,
            pool_slice=dom.pool_slice,
        )
        # Reserve the pool tail for query tables (see docstring).
        reserve_n = max(1, len(root_pool) // 4)
        lake_pool = root_pool[:-reserve_n] or root_pool
        query_reserved = root_pool[-reserve_n:]
        extra_pools = {
            role: world.pool(t, pool_size, coverage, seed * 7919 + d_i * 31 + j + 1)
            for j, (role, t) in enumerate(dom.extra_cols)
        }

        for t_i in range(n_tables):
            tname = f"{name}.{dom.name}.{t_i:03d}"
            tables_by_domain.setdefault(dom.name, []).append(tname)
            full = t_i < n_queries
            n_rows = int(g.integers(rows_lo, rows_hi + 1))
            # Horizontal partitioning à la TUS: each table draws from a
            # window of the (domain-shuffled) root pool, so same-domain
            # tables overlap only partially — some pairs share no rows at
            # all, exactly like the benchmark's non-overlapping
            # partitions. Value overlap alone therefore cannot recover
            # all unionable pairs; semantics must.
            window = max(n_rows, int(n_rows * window_factor))
            start = int(g.integers(0, len(lake_pool)))
            offs = g.integers(0, window, n_rows)
            roots = [lake_pool[int((start + o) % len(lake_pool))] for o in offs]
            if full:
                # Query table: only `query_overlap` of its rows come from
                # the lake-visible pool; the rest from the reserved slice.
                # The last ceil(zero_frac * n_queries) queries per domain
                # are fully reserved (zero lake overlap).
                n_zero = int(round(query_zero_frac * n_queries))
                this_overlap = 0.0 if t_i >= n_queries - n_zero else query_overlap
                n_res = n_rows - int(round(n_rows * this_overlap))
                # Per-query disjoint sub-slice of the reserve, so sibling
                # query tables cannot bridge a zero-overlap query back
                # into the lake through shared reserved values.
                mine = query_reserved[t_i::max(1, n_queries)] or query_reserved
                ridx = g.integers(0, len(mine), n_res)
                for slot, ri in zip(
                    g.choice(n_rows, n_res, replace=False), ridx
                ):
                    roots[int(slot)] = mine[int(ri)]

            # Decide the vertical projection (which columns survive).
            kept_edges: list[Edge] = []
            p1, p2, p3 = vertical_keep
            if dom.relational and dom.edges:
                level1 = [e for e in dom.edges if e.src_role == dom.root_role]
                chains = [e for e in dom.edges if e.src_role != dom.root_role]
                kept1 = [e for e in level1 if full or g.random() < p1]
                if not kept1 and level1:
                    kept1 = [level1[int(g.integers(0, len(level1)))]]
                kept_roles = {dom.root_role} | {e.dst_role for e in kept1}
                kept2 = [e for e in chains
                         if e.src_role in kept_roles and (full or g.random() < p2)]
                kept_edges = kept1 + kept2
            kept_extra = [rc for rc in dom.extra_cols if full or g.random() < p3]
            kept_attrs = [a for a in dom.attrs if full or g.random() < 0.6]

            # Materialize column token columns (entity ids), then render labels.
            columns: list[tuple[str, list[str | None], int]] = []  # (name, values, is_num)
            role_tokens: dict[str, list[int]] = {dom.root_role: roots}
            order: list[str] = [dom.root_role]
            for e in kept_edges:
                src = role_tokens[e.src_role]
                deps = [
                    world.object_of(s, e.pred, e.dst_type, coverage) for s in src
                ]
                # Relationship cell noise: swap a few dependent cells
                # within the column. Values stay type-pure but the pair
                # is no longer functional — breaking FDs the way dirty
                # open data does, which thins the synthesized dictionary.
                if cell_noise > 0:
                    for i in np.nonzero(g.random(n_rows) < cell_noise)[0]:
                        deps[int(i)] = deps[int(g.integers(0, n_rows))]
                role_tokens[e.dst_role] = deps
                order.append(e.dst_role)
            for role, t in kept_extra:
                pool = extra_pools[role]
                role_tokens[role] = [pool[int(i)] for i in g.integers(0, len(pool), n_rows)]
                order.append(role)
            for ci, role in enumerate(order):
                vals: list[str | None] = [world.label(tok) for tok in role_tokens[role]]
                columns.append((_col_name(g, role, ci, name_noise), vals, 0))
            for a in kept_attrs:
                nm = _ATTR_SYNONYMS[a][int(g.integers(0, len(_ATTR_SYNONYMS[a])))]
                vals = [_attr_value(g, a) for _ in range(n_rows)]
                columns.append((nm, vals, int(a in _NUM_ATTRS)))

            # Nulls.
            for _, vals, _ in columns:
                for idx in np.nonzero(g.random(n_rows) < null_rate)[0]:
                    vals[int(idx)] = None

            n_cols = len(columns)
            tbl = pd.DataFrame({
                "table": np.repeat(tname, n_rows * n_cols),
                "col": np.repeat(np.arange(n_cols), n_rows),
                "col_name": np.repeat([c[0] for c in columns], n_rows),
                "row": np.tile(np.arange(n_rows, dtype=np.int64), n_cols),
                "value": [v for _, vals, _ in columns for v in vals],
                "is_num": np.repeat([c[2] for c in columns], n_rows),
            })
            cells_parts.append(tbl)
            meta_rows.append((tname, dom.name, dom.relational, n_rows, n_cols,
                              0 if dom.relational else -1))
            if t_i < n_queries:
                queries.append((tname, 0))

    for dom_name, tables in tables_by_domain.items():
        dom = next(d for d in domains if d.name == dom_name)
        if not dom.relational:
            continue
        qset = {q for q, _ in queries}
        for q in tables:
            if q in qset:
                for t in tables:
                    if t != q:
                        gt_rows.append((q, t))

    cells = pd.concat(cells_parts, ignore_index=True)
    meta = pd.DataFrame(
        meta_rows,
        columns=["table", "domain", "relational", "n_rows", "n_cols", "intent_col"],
    )
    gt = pd.DataFrame(gt_rows, columns=["query", "table"])
    return Benchmark(name=name, cells=cells, meta=meta, queries=queries, gt=gt, k=k)
