"""Syntactic join discovery (paper §2.1 Table_J_Table, §6.2 Table 3).

Builds a driver-side join index over the profiler's value-level minhash
signatures for a set of candidate columns, then ranks joinable
candidates for a query column under one of three scoring schemes:

- ``containment`` — CMDL: Jaccard set containment estimated from
  signatures + exact cardinalities, computed **in both directions** and
  combined with max (§3: "for joinable discoveries the score is
  computed in both directions");
- ``jaccard`` — Aurum: symmetric minhash Jaccard similarity;
- ``d3l`` — D3L: weighted Euclidean combination of the name-distance
  and value-distance signals (§6.3's description of D3L's mechanism).
"""
from __future__ import annotations

import numpy as np

from repro.discovery.names import qgram_jaccard
from repro.sketch.minhash import pairwise_containment, pairwise_jaccard
from repro.sketch.profiler import Profile

METHODS = ("containment", "jaccard", "d3l")


class JoinIndex:
    """All-pairs join scores over a fixed candidate column set."""

    def __init__(self, profile: Profile, candidate_cols: list[str], *,
                 d3l_name_weight: float = 0.5):
        self.cols = [c for c in candidate_cols if c in profile.value_sigs]
        self.pos = {c: i for i, c in enumerate(self.cols)}
        sigs = np.stack([profile.value_sigs[c][0] for c in self.cols])
        sizes = np.array([profile.value_sigs[c][1] for c in self.cols])
        self.containment = pairwise_containment(sigs, sizes)   # C[i,j] = |Ai∩Aj|/|Ai|
        self.jaccard = pairwise_jaccard(sigs)
        meta = profile.col_meta.set_index("col_id")
        self.tables = {c: meta.loc[c, "table"] for c in self.cols}
        names = [meta.loc[c, "column"] for c in self.cols]
        n = len(self.cols)
        self.name_sim = np.eye(n)
        for i in range(n):
            for j in range(i + 1, n):
                s = qgram_jaccard(names[i], names[j])
                self.name_sim[i, j] = self.name_sim[j, i] = s
        self.d3l_name_weight = d3l_name_weight

    def _scores(self, qi: int, method: str) -> np.ndarray:
        if method == "containment":
            return np.maximum(self.containment[qi, :], self.containment[:, qi])
        if method == "jaccard":
            return self.jaccard[qi]
        if method == "d3l":
            # distances: lower is better; return negative distance as score
            d_name = 1.0 - self.name_sim[qi]
            d_val = 1.0 - self.jaccard[qi]
            w = self.d3l_name_weight
            return -np.sqrt(w * d_name**2 + (1 - w) * d_val**2)
        raise ValueError(f"unknown method {method!r}")

    def rank(self, query_col: str, *, method: str = "containment",
             k: int | None = None, exclude_same_table: bool = True) -> list[tuple[str, float]]:
        """Ranked (col_id, score) join candidates for ``query_col``."""
        qi = self.pos[query_col]
        scores = self._scores(qi, method)
        qt = self.tables[query_col]
        out = []
        for j, c in enumerate(self.cols):
            if j == qi:
                continue
            if exclude_same_table and self.tables[c] == qt:
                continue
            out.append((c, float(scores[j])))
        out.sort(key=lambda kv: (-kv[1], kv[0]))
        return out[:k] if k is not None else out
