"""SANTOS scoring — Sec 6, Eq 7–11 — pure-python reference + tree matcher.

The Spark side of the pipeline (``repro.core.search``) computes the same
quantities with joins; these functions are the executable specification
used by the driver-side tree matching and by unit tests (including the
paper's Example 18 numbers).
"""
from __future__ import annotations

import hashlib
from dataclasses import dataclass


def rank_tiebreak(query: str, table: str) -> int:
    """Deterministic, GT-uncorrelated tie-break for equal scores.

    Ranking by table name would systematically favor or penalize name
    families (our twin domains sort after their base domain), which
    silently biases P@k; a hash of (query, table) is stable across runs
    but uncorrelated with the ground truth.
    """
    return int.from_bytes(
        hashlib.md5(f"{query}|{table}".encode()).digest()[:8], "big"
    )


def col_match(q_cs: dict, t_cs: dict) -> tuple[float, object | None]:
    """Eq 7: max over intersecting annotations of the confidence product.

    ``q_cs``/``t_cs`` map annotation -> confidence. Returns
    ``(score, argmax annotation)``; ``(0.0, None)`` if no intersection.
    Ties break on the annotation's sort order for determinism.
    """
    best, best_a = 0.0, None
    for a in sorted(set(q_cs) & set(t_cs), key=str):
        s = q_cs[a] * t_cs[a]
        if s > best:
            best, best_a = s, a
    return best, best_a


def rel_match(q_rs: dict, t_rs: dict) -> tuple[float, object | None]:
    """Eq 8 — same maximization over intersecting relationship types."""
    return col_match(q_rs, t_rs)


def pair_match_method(
    q_cs1: dict, q_rs: dict, q_cs2: dict, t_cs1: dict, t_rs: dict, t_cs2: dict
) -> tuple[float, object | None, object | None]:
    """Eq 9 for one semantic-graph method.

    Returns ``(score, a1, a2)`` where ``a1``/``a2`` are the selected
    column annotations (needed for Eq 10's granularity divisor).
    """
    cm1, a1 = col_match(q_cs1, t_cs1)
    rm, _ = rel_match(q_rs, t_rs)
    cm2, a2 = col_match(q_cs2, t_cs2)
    return cm1 * rm * cm2, a1, a2


def inter_method_pair_match(
    pm_kb: float, gs1: float, gs2: float, pm_synth: float
) -> tuple[float, str]:
    """Eq 10: compare the KB pair match (granularity bias removed) with
    the synthesized pair match; return the winning score *with* its
    native confidence (KB keeps its gs factors).

    ``gs1``/``gs2`` are the granularity scores of the data-lake-side
    annotations selected inside ``pm_kb`` (the query side carries no gs,
    Eq 3). Missing branches are passed as 0 (and gs as 1).
    """
    unbiased = pm_kb / (gs1 * gs2) if gs1 > 0 and gs2 > 0 else 0.0
    if unbiased >= pm_synth:
        return pm_kb, "kb"
    return pm_synth, "synth"


@dataclass(frozen=True)
class QueryTree:
    """Query semantic tree rooted at the intent column (Sec 3 / Sec 7.4).

    ``edges`` are ordered (parent, child) column positions, breadth-first
    from the root; paper examples are depth <= 2 and so are ours.
    """

    root: int
    edges: tuple[tuple[int, int], ...]

    def children(self, node: int) -> list[int]:
        return [v for u, v in self.edges if u == node]


def build_query_tree(
    intent: int, rel_pairs: set[tuple[int, int]], max_depth: int = 2
) -> QueryTree:
    """BFS from the intent column over columns linked by any non-empty RS
    (from either method). ``rel_pairs`` is a set of *unordered-available*
    ordered pairs; an edge (u, v) exists if either orientation has RS.
    """
    und = {frozenset(p) for p in rel_pairs if p[0] != p[1]}
    visited = {intent}
    frontier = [intent]
    edges: list[tuple[int, int]] = []
    for _ in range(max_depth):
        nxt = []
        for u in frontier:
            for p in sorted(und, key=sorted):
                a, b = sorted(p)
                v = b if a == u else (a if b == u else None)
                if v is not None and v not in visited:
                    visited.add(v)
                    edges.append((u, v))
                    nxt.append(v)
        frontier = nxt
    return QueryTree(root=intent, edges=tuple(edges))


def match_tree(
    tree: QueryTree,
    pair_scores: dict[tuple[int, int, int, int], float],
) -> float:
    """Eq 11: score the best consistent embedding of (a subtree of) the
    query tree into a data-lake table's semantic graph.

    ``pair_scores[(qu, qv, tu, tv)]`` is the final inter-method
    pairMatch for mapping query column ``qu``->lake column ``tu`` and
    ``qv``->``tv``. The embedding is built greedily level by level:
    for each candidate lake root, tree edges are assigned their best
    available lake pair in descending score order, keeping the node
    mapping consistent (a query column maps to one lake column, a lake
    column hosts one query column). Deterministic tie-breaks.

    Returns the maximum total score over candidate roots (0.0 if the
    intent column matches nothing).
    """
    roots = sorted({tu for (qu, _qv, tu, _tv) in pair_scores if qu == tree.root})
    best = 0.0
    for tr in roots:
        mapping = {tree.root: tr}
        used = {tr}
        total = 0.0
        frontier = [tree.root]
        while frontier:
            level_edges = [(u, v) for u in frontier for v in tree.children(u)]
            cands = []
            for (u, v) in level_edges:
                tu = mapping.get(u)
                if tu is None:
                    continue
                for (qu, qv, tuu, tv), s in pair_scores.items():
                    if qu == u and qv == v and tuu == tu and tv not in used and s > 0:
                        cands.append((s, u, v, tv))
            cands.sort(key=lambda x: (-x[0], x[1], x[2], x[3]))
            assigned: set[int] = set()
            next_frontier = []
            for s, u, v, tv in cands:
                if v in assigned or tv in used:
                    continue
                assigned.add(v)
                used.add(tv)
                mapping[v] = tv
                total += s
                next_frontier.append(v)
            frontier = next_frontier
        best = max(best, total)
    return best


def greedy_bipartite_sum(scores: dict[tuple[int, int], float]) -> float:
    """Greedy 1-1 assignment sum for column-only scoring (SANTOS_Col and
    the D3L table score): repeatedly take the highest remaining
    (query col, lake col) score with both sides unused."""
    items = sorted(scores.items(), key=lambda kv: (-kv[1], kv[0]))
    used_q: set[int] = set()
    used_t: set[int] = set()
    total = 0.0
    for (qc, tc), s in items:
        if qc in used_q or tc in used_t or s <= 0:
            continue
        used_q.add(qc)
        used_t.add(tc)
        total += s
    return total
