"""Evaluation metrics: precision/recall@k, R-precision, relative recall.

Matches the paper's metric definitions (§6): top-k precision/recall per
query averaged over the query workload; when k equals the per-query
ground-truth size, precision = recall ("R-precision" [25], used in
Table 3); Relative Recall [59] for the per-measure union analysis
(Table 5).
"""
from __future__ import annotations

import numpy as np


def precision_recall_at_k(ranked: list[str], truth: set[str], k: int) -> tuple[float, float]:
    """Precision and recall of the top-k of ``ranked`` against ``truth``."""
    if not truth:
        return 0.0, 0.0
    top = ranked[:k]
    hits = sum(1 for x in top if x in truth)
    return (hits / k if k else 0.0), hits / len(truth)


def r_precision(ranked: list[str], truth: set[str]) -> float:
    """Precision at k = |truth| (equals recall at that k)."""
    if not truth:
        return 0.0
    p, _ = precision_recall_at_k(ranked, truth, len(truth))
    return p


def macro_pr_at_k(results: dict[str, list[str]], truths: dict[str, set[str]],
                  k: int) -> tuple[float, float]:
    """Average P@k / R@k over queries that have non-empty ground truth."""
    ps, rs = [], []
    for q, truth in truths.items():
        if not truth:
            continue
        p, r = precision_recall_at_k(results.get(q, []), truth, k)
        ps.append(p)
        rs.append(r)
    return (float(np.mean(ps)) if ps else 0.0, float(np.mean(rs)) if rs else 0.0)


def macro_r_precision(results: dict[str, list[str]], truths: dict[str, set[str]]) -> float:
    """Average R-precision over queries with non-empty ground truth."""
    vals = [r_precision(results.get(q, []), t) for q, t in truths.items() if t]
    return float(np.mean(vals)) if vals else 0.0


def precision_recall_sets(found: set, truth: set) -> tuple[float, float]:
    """Set-valued precision/recall (used for PK-FK discovery, Table 4)."""
    if not found:
        return 0.0, 0.0
    tp = len(found & truth)
    return tp / len(found), (tp / len(truth) if truth else 0.0)


def relative_recall(found_by_measure: dict[str, set], *,
                    reference: set | None = None) -> dict[str, float]:
    """RR score per measure: |found_S ∩ U| / |U|, U = union of all measures.

    ``found_by_measure`` maps measure name → set of true matches it
    identified. If ``reference`` is given it is used as U instead.
    """
    union: set = set()
    if reference is None:
        for s in found_by_measure.values():
            union |= s
    else:
        union = set(reference)
    if not union:
        return {m: 0.0 for m in found_by_measure}
    return {m: len(s & union) / len(union) for m, s in found_by_measure.items()}
