"""Jaro string similarity (used by the entity-matching baseline, §6.1).

Standard Jaro definition: matches within a window of
floor(max(|a|,|b|)/2)-1, transpositions counted over the matched
sequences. Pure Python, deterministic. (The paper notes the Jaro-based
baseline is quadratic and was infeasible on Benchmark 1B — our scale is
small enough to run it, but the cost asymmetry is still visible in the
throughput benchmarks.)
"""
from __future__ import annotations


def jaro(a: str, b: str) -> float:
    """Jaro similarity in [0, 1]."""
    if a == b:
        return 1.0
    la, lb = len(a), len(b)
    if la == 0 or lb == 0:
        return 0.0
    window = max(la, lb) // 2 - 1
    match_a = [False] * la
    match_b = [False] * lb
    matches = 0
    for i, ch in enumerate(a):
        lo = max(0, i - window)
        hi = min(lb, i + window + 1)
        for j in range(lo, hi):
            if not match_b[j] and b[j] == ch:
                match_a[i] = match_b[j] = True
                matches += 1
                break
    if matches == 0:
        return 0.0
    sa = [ch for i, ch in enumerate(a) if match_a[i]]
    sb = [ch for j, ch in enumerate(b) if match_b[j]]
    transpositions = sum(1 for x, y in zip(sa, sb) if x != y) // 2
    m = matches
    return (m / la + m / lb + (m - transpositions) / m) / 3.0


def max_jaro(token: str, candidates: list[str]) -> float:
    """Best Jaro similarity of ``token`` against a candidate list."""
    return max((jaro(token, c) for c in candidates), default=0.0)
