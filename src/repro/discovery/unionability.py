"""Unionable-table discovery (paper §5.1, evaluated in §6.3, Tables 5 / Fig 7).

For a query table T, candidate tables are scored by aligning columns
through a maximal bipartite matching (as in TUS [49]) over per-column-
pair similarity scores. Three combination schemes reproduce the three
systems compared in §6.3:

- ``ensemble`` (CMDL): per column pair, combine the four measures (name,
  value containment, numeric overlap, semantic embedding) first, then
  match columns — "scores of individual similarity measures are
  combined first before aligning tables using bipartite graph matching";
- ``aurum``: only schema(name) and Jaccard value similarity, combined by
  taking the max of the two;
- ``d3l``: match per individual measure to get per-measure table scores,
  then combine as a weighted Euclidean sum of distances.

Single-measure scoring (measures=('name',) etc.) supports the Relative
Recall analysis of Table 5.
"""
from __future__ import annotations

import numpy as np

from repro.discovery.names import qgram_jaccard
from repro.sketch.minhash import est_containment, est_jaccard
from repro.sketch.profiler import Profile
from repro.sketch.stats import range_overlap

MEASURES = ("name", "containment", "numeric", "semantic")


def _cosine(a: np.ndarray, b: np.ndarray) -> float:
    na, nb = np.linalg.norm(a), np.linalg.norm(b)
    if na == 0 or nb == 0:
        return 0.0
    return float(np.dot(a, b) / (na * nb))


class UnionIndex:
    """Pairwise table unionability scoring over a fixed table set."""

    def __init__(self, profile: Profile, tables: list[str]):
        self.profile = profile
        meta = profile.col_meta
        self.tables = [t for t in tables if (meta["table"] == t).any()]
        self.cols_of = {
            t: [r for r in meta[meta["table"] == t].itertuples()]
            for t in self.tables
        }

    # ---- column-pair measures ---------------------------------------------
    def column_scores(self, a, b) -> dict[str, float | None]:
        """Per-measure scores for a column pair (None = not applicable)."""
        p = self.profile
        out: dict[str, float | None] = {
            "name": qgram_jaccard(a.column, b.column),
            "containment": None, "numeric": None, "semantic": None,
            "jaccard": None,
        }
        if a.dtype == "str" and b.dtype == "str":
            sa = p.value_sigs.get(a.col_id)
            sb = p.value_sigs.get(b.col_id)
            if sa and sb:
                out["containment"] = max(
                    est_containment(sa[0], sa[1], sb[0], sb[1]),
                    est_containment(sb[0], sb[1], sa[0], sa[1]))
                out["jaccard"] = est_jaccard(sa[0], sb[0])
            va, vb = p.content_vecs.get(a.col_id), p.content_vecs.get(b.col_id)
            if va is not None and vb is not None:
                out["semantic"] = _cosine(va, vb)
        elif a.dtype == "num" and b.dtype == "num":
            st = p.numeric_stats
            if a.col_id in st.index and b.col_id in st.index:
                ra, rb = st.loc[a.col_id], st.loc[b.col_id]
                out["numeric"] = range_overlap(ra["vmin"], ra["vmax"],
                                               rb["vmin"], rb["vmax"])
        return out

    # ---- matching ----------------------------------------------------------
    @staticmethod
    def _greedy_match(pair_scores: list[tuple[float, int, int]],
                      n_a: int, n_b: int) -> float:
        """Greedy maximal bipartite matching; returns normalized score sum."""
        pair_scores.sort(key=lambda t: -t[0])
        used_a: set[int] = set()
        used_b: set[int] = set()
        total = 0.0
        for s, i, j in pair_scores:
            if i in used_a or j in used_b or s <= 0:
                continue
            used_a.add(i)
            used_b.add(j)
            total += s
        return total / max(n_a, n_b) if max(n_a, n_b) else 0.0

    def _table_score_single(self, t_a: str, t_b: str,
                            measures: tuple[str, ...], combiner: str) -> float | None:
        ca, cb = self.cols_of[t_a], self.cols_of[t_b]
        pairs = []
        for i, a in enumerate(ca):
            for j, b in enumerate(cb):
                sc = self.column_scores(a, b)
                if combiner == "aurum":
                    vals = [v for v in (sc["name"], sc["jaccard"]) if v is not None]
                    s = max(vals) if vals else None
                else:
                    vals = [sc[m] for m in measures if sc[m] is not None]
                    s = float(np.mean(vals)) if vals else None
                if s is not None:
                    pairs.append((s, i, j))
        if not pairs:
            return None
        return self._greedy_match(pairs, len(ca), len(cb))

    def table_score(self, t_a: str, t_b: str, *,
                    measures: tuple[str, ...] = MEASURES,
                    combiner: str = "ensemble") -> float | None:
        """Unionability score of (t_a, t_b), or None if no measure applies."""
        if combiner in ("ensemble", "aurum"):
            return self._table_score_single(t_a, t_b, measures, combiner)
        if combiner == "d3l":
            dists = []
            for m in measures:
                s = self._table_score_single(t_a, t_b, (m,), "ensemble")
                if s is not None:
                    dists.append(1.0 - s)
            if not dists:
                return None
            return 1.0 - float(np.sqrt(np.mean(np.square(dists))))
        raise ValueError(f"unknown combiner {combiner!r}")

    def rank(self, table: str, *, k: int | None = None,
             measures: tuple[str, ...] = MEASURES,
             combiner: str = "ensemble") -> list[tuple[str, float]]:
        """Ranked unionable candidates for ``table`` (excluding itself)."""
        out = []
        for t in self.tables:
            if t == table:
                continue
            s = self.table_score(table, t, measures=measures, combiner=combiner)
            if s is not None and s > 0:
                out.append((t, float(s)))
        out.sort(key=lambda kv: (-kv[1], kv[0]))
        return out[:k] if k is not None else out
