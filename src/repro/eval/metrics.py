"""Effectiveness metrics (paper §5.1.3): MAP@k, P@k, R@k, IDEAL recall, purity."""
from __future__ import annotations


def average_precision_at_k(ranked: list[str], relevant: set[str], k: int) -> float:
    """AP@k normalized by min(k, |relevant|) (standard MAP@k, [35])."""
    if not relevant:
        return 0.0
    hits = 0
    ap = 0.0
    for i, tid in enumerate(ranked[:k], start=1):
        if tid in relevant:
            hits += 1
            ap += hits / i
    return ap / min(k, len(relevant))


def precision_at_k(ranked: list[str], relevant: set[str], k: int) -> float:
    return sum(1 for t in ranked[:k] if t in relevant) / k


def recall_at_k(ranked: list[str], relevant: set[str], k: int) -> float:
    if not relevant:
        return 0.0
    return sum(1 for t in ranked[:k] if t in relevant) / len(relevant)


def ideal_recall(ground_truth: dict[str, set[str]], k: int) -> float:
    """Max achievable R@k: k can be smaller than the relevant set (§5.2)."""
    vals = [min(k, len(r)) / len(r) for r in ground_truth.values() if r]
    return sum(vals) / len(vals) if vals else 0.0


def evaluate_rankings(
    rankings: dict[str, list[str]], ground_truth: dict[str, set[str]], k: int
) -> dict[str, float]:
    """Mean AP/P/R@k over queries."""
    n = len(rankings)
    if n == 0:
        return {"map": 0.0, "p": 0.0, "r": 0.0}
    m = p = r = 0.0
    for q, ranked in rankings.items():
        rel = ground_truth[q]
        m += average_precision_at_k(ranked, rel, k)
        p += precision_at_k(ranked, rel, k)
        r += recall_at_k(ranked, rel, k)
    return {"map": m / n, "p": p / n, "r": r / n}


def purity(assignment: dict[str, int], labels: dict[str, str]) -> float:
    """Cluster purity (paper §5.5): fraction of items whose label matches
    their cluster's majority label."""
    clusters: dict[int, list[str]] = {}
    for item, c in assignment.items():
        clusters.setdefault(c, []).append(labels[item])
    good = 0
    total = 0
    for members in clusters.values():
        counts: dict[str, int] = {}
        for l in members:
            counts[l] = counts.get(l, 0) + 1
        good += max(counts.values())
        total += len(members)
    return good / total if total else 0.0
