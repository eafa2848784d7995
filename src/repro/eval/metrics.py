"""Evaluation measures — Sec 8.1, Eq 12–13.

Paper conventions: a method may return fewer than k results; the
missing slots count as incorrect for P@k (denominator stays k). R@k is
bounded by ``k / |T_Q|`` when the ground truth is larger than k.
MAP@k is the running-precision mean with the list length fixed at k:
``MAP@k = (1/k) * sum_{i=1..k} P@i``.
"""
from __future__ import annotations


def precision_at_k(ranked: list[str], relevant: set[str], k: int) -> float:
    """Eq 12 left: |top-k ∩ relevant| / k (missing results count wrong)."""
    if k <= 0:
        return 0.0
    hits = sum(1 for t in ranked[:k] if t in relevant)
    return hits / k


def recall_at_k(ranked: list[str], relevant: set[str], k: int) -> float:
    """Eq 12 right: |top-k ∩ relevant| / |relevant|."""
    if not relevant:
        return 0.0
    hits = sum(1 for t in ranked[:k] if t in relevant)
    return hits / len(relevant)


def map_at_k(ranked: list[str], relevant: set[str], k: int) -> float:
    """Eq 13: mean of P@i for i = 1..k."""
    if k <= 0:
        return 0.0
    return sum(precision_at_k(ranked, relevant, i) for i in range(1, k + 1)) / k


def evaluate_all(
    results: dict[str, list[str]], gt: dict[str, set[str]], k: int
) -> dict[str, float]:
    """Average P@k / R@k / MAP@k over queries (queries absent from
    ``results`` score zero, as the paper treats unanswered queries)."""
    queries = sorted(gt)
    if not queries:
        return {"P": 0.0, "R": 0.0, "MAP": 0.0}
    p = r = m = 0.0
    for q in queries:
        ranked = results.get(q, [])
        rel = gt[q]
        p += precision_at_k(ranked, rel, k)
        r += recall_at_k(ranked, rel, k)
        m += map_at_k(ranked, rel, k)
    n = len(queries)
    return {"P": p / n, "R": r / n, "MAP": m / n}


def ideal_recall_at_k(gt: dict[str, set[str]], k: int) -> float:
    """Best achievable average R@k given ground-truth sizes (the "Ideal"
    line in Fig 8 (b)/(d))."""
    if not gt:
        return 0.0
    return sum(min(k, len(rel)) / len(rel) for rel in gt.values() if rel) / len(gt)
