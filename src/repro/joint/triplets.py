"""Triplet generation with hard sampling + aggregation (§4.2, Fig. 5).

Given a mini batch's m×n relatedness matrix, each document (anchor)
yields at most one aggregated triplet:

- *positives*: all columns with relatedness ≥ ``pos_threshold``
  ("aggregate all positive samples into one instance");
- *negatives*: only the **hard** negatives — those whose distance to the
  anchor in the current embedding space is at most a cutoff computed as
  the average (or median) distance over all negative samples — are
  aggregated; easy negatives are ignored.
- ``hard=None`` disables hard sampling and emits all (pos, neg) pairs as
  individual triplets — the quadratic-blowup setting the paper measures
  against in Fig. 10(b).

Documents lacking a positive or a negative column are skipped
(footnote 4).
"""
from __future__ import annotations

import numpy as np

from repro.joint.model import Triplet


def generate_triplets(doc_chunk: list[str], col_chunk: list[str],
                      rel: dict[tuple[str, str], float],
                      Z: np.ndarray, index: dict[str, int], *,
                      pos_threshold: float = 0.5,
                      hard: str | None = "avg") -> list[Triplet]:
    """Build aggregated triplets for one mini batch.

    ``Z`` holds current embeddings of every batch DE, ``index`` maps
    DE id → row in ``Z`` (also used as the Triplet member indices).
    """
    out: list[Triplet] = []
    for d in doc_chunk:
        pos = [c for c in col_chunk if rel.get((d, c), 0.0) >= pos_threshold]
        neg = [c for c in col_chunk if rel.get((d, c), 0.0) < pos_threshold]
        if not pos or not neg:
            continue
        ia = index[d]
        ip = [index[c] for c in pos]
        in_ = [index[c] for c in neg]
        if hard is None:
            out.extend(Triplet(ia, [p], [n]) for p in ip for n in in_)
            continue
        dists = np.linalg.norm(Z[in_] - Z[ia], axis=1)
        cutoff = float(np.mean(dists)) if hard == "avg" else float(np.median(dists))
        hard_negs = [i for i, dist in zip(in_, dists) if dist <= cutoff]
        if not hard_negs:
            hard_negs = [in_[int(np.argmin(dists))]]
        out.append(Triplet(ia, ip, hard_negs))
    return out
