"""Semantic nearest-neighbour index — the Annoy substitute (§3, Table 6).

Annoy builds random-projection trees for approximate cosine search. At
reproduction scale (≤ a few thousand DEs of dimension ≤ 200) exact
search via one numpy matrix product is faster than tree traversal and
strictly more accurate, and the system only ever consumes "top-k
nearest DEs with scores", so the exact index is behaviourally a
superset of Annoy. The memory-mapped C++ speed that gives the paper's
semantic labeling function its 1000 Qps shows up here as vectorized
BLAS — the throughput *ordering* of Table 6 is preserved.
"""
from __future__ import annotations

import numpy as np


class AnnIndex:
    """Exact cosine top-k index over a fixed set of vectors."""

    def __init__(self, ids: list[str], matrix: np.ndarray):
        if len(ids) != matrix.shape[0]:
            raise ValueError("ids/matrix length mismatch")
        self.ids = list(ids)
        norms = np.linalg.norm(matrix, axis=1, keepdims=True)
        norms[norms == 0] = 1.0
        self.matrix = matrix / norms

    def __len__(self) -> int:
        return len(self.ids)

    def query(self, vec: np.ndarray, k: int = 10) -> list[tuple[str, float]]:
        """Top-k (id, cosine similarity) for one query vector."""
        n = np.linalg.norm(vec)
        v = vec / n if n > 0 else vec
        sims = self.matrix @ v
        k = min(k, len(self.ids))
        idx = np.argpartition(-sims, k - 1)[:k]
        idx = idx[np.argsort(-sims[idx], kind="stable")]
        return [(self.ids[i], float(sims[i])) for i in idx]

    def query_batch(self, mat: np.ndarray, k: int = 10) -> list[list[tuple[str, float]]]:
        """Vectorized top-k for many query vectors at once."""
        norms = np.linalg.norm(mat, axis=1, keepdims=True)
        norms[norms == 0] = 1.0
        sims = (mat / norms) @ self.matrix.T
        k = min(k, len(self.ids))
        out = []
        for row in sims:
            idx = np.argpartition(-row, k - 1)[:k]
            idx = idx[np.argsort(-row[idx], kind="stable")]
            out.append([(self.ids[i], float(row[i])) for i in idx])
        return out
