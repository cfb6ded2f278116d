"""LSH Ensemble — containment-oriented minhash index (Zhu et al. [69]).

The paper indexes minwise signatures with LSH Ensemble to answer
set-containment queries (syntactic similarity, §3) and uses top-k probes
of this index as the "syntactic" labeling function (§4.1).

Implementation follows the original design:

- DEs are partitioned by domain size (equi-depth on cardinality);
- each partition maintains banded hash tables for a ladder of row
  counts r ∈ {1, 2, 4, 8, 16};
- at query time, the containment threshold is translated into the
  partition's Jaccard regime using the query size and the partition's
  upper-bound cardinality — ``j = t·q / (q + d_max − t·q)`` — and the
  (b, r) whose S-curve threshold best matches that j is probed. This
  query-size adaptivity is the essence of LSH Ensemble: a small
  document probing large columns automatically gets r=1-style banding
  (high recall), while column-to-column probes get selective bands.

Candidates are finally ranked by the containment estimate from
signatures + exact cardinalities, so the returned scores are explicit.
"""
from __future__ import annotations

from collections import defaultdict

import numpy as np

_R_LADDER = (1, 2, 4, 8, 16)


def jaccard_for_containment(t: float, q: int, d_max: int) -> float:
    """Containment threshold → equivalent Jaccard at query size q (§[69])."""
    q = max(1, q)
    denom = q + d_max - t * q
    return max(1e-6, t * q / denom) if denom > 0 else 1.0


def _best_r(threshold_j: float, n_hashes: int) -> int:
    """Pick r from the ladder whose S-curve threshold (1/b)^(1/r) is
    closest to ``threshold_j`` (with b = n_hashes // r)."""
    best, best_err = _R_LADDER[0], float("inf")
    for r in _R_LADDER:
        b = n_hashes // r
        if b < 1:
            continue
        t_est = (1.0 / b) ** (1.0 / r)
        err = abs(t_est - threshold_j)
        if err < best_err:
            best, best_err = r, err
    return best


class LSHEnsemble:
    """Containment index over (id, signature, set-size) entries."""

    def __init__(self, entries: list[tuple[str, np.ndarray, int]], *,
                 threshold: float = 0.5, n_partitions: int = 4):
        if not entries:
            raise ValueError("LSHEnsemble needs at least one entry")
        self.threshold = threshold
        self.sigs = {i: np.asarray(s) for i, s, _ in entries}
        self.sizes = {i: int(n) for i, _, n in entries}
        self.n_hashes = len(next(iter(self.sigs.values())))

        order = sorted(entries, key=lambda e: e[2])
        n_partitions = min(n_partitions, len(order))
        chunks = np.array_split(np.arange(len(order)), n_partitions)
        self.partitions = []
        for chunk in chunks:
            if len(chunk) == 0:
                continue
            members = [order[i] for i in chunk]
            d_max = max(m[2] for m in members) or 1
            tables: dict[int, dict] = {}
            for r in _R_LADDER:
                b = self.n_hashes // r
                if b < 1:
                    continue
                table: dict[tuple[int, bytes], list[str]] = defaultdict(list)
                for de_id, sig, _ in members:
                    sig = np.asarray(sig)
                    for band in range(b):
                        key = (band, sig[band * r:(band + 1) * r].tobytes())
                        table[key].append(de_id)
                tables[r] = table
            self.partitions.append({"d_max": d_max, "tables": tables})

    def _candidates(self, sig: np.ndarray, query_size: int,
                    threshold: float) -> set[str]:
        cands: set[str] = set()
        sig = np.asarray(sig)
        for p in self.partitions:
            j = jaccard_for_containment(threshold, query_size, p["d_max"])
            r = _best_r(j, self.n_hashes)
            table = p["tables"].get(r)
            if table is None:
                continue
            b = self.n_hashes // r
            for band in range(b):
                key = (band, sig[band * r:(band + 1) * r].tobytes())
                cands.update(table.get(key, ()))
        return cands

    def query(self, sig: np.ndarray, size: int, *, k: int | None = None,
              threshold: float | None = None) -> list[tuple[str, float]]:
        """Rank candidate DEs by estimated containment of the query set.

        Containment direction is query→candidate: |Q ∩ X| / |Q|, the
        asymmetric measure CMDL uses from the document side (§3).
        Returns (de_id, est_containment) sorted descending; filtered at
        ``threshold`` if given (also used for banding selection),
        truncated at ``k`` if given.
        """
        t = threshold if threshold is not None else self.threshold
        cands = sorted(self._candidates(sig, size, t))
        if not cands:
            return []
        # vectorized containment estimation over all candidates at once
        sig = np.asarray(sig)
        mat = np.stack([self.sigs[c] for c in cands])
        j = (mat == sig).mean(axis=1)
        sizes = np.array([self.sizes[c] for c in cands], dtype="float64")
        inter = j * (size + sizes) / (1.0 + j)
        cont = np.clip(inter / max(size, 1), 0.0, 1.0)
        scored = [(c, float(s)) for c, s in zip(cands, cont)
                  if threshold is None or s >= threshold]
        scored.sort(key=lambda kv: (-kv[1], kv[0]))
        return scored[:k] if k is not None else scored
