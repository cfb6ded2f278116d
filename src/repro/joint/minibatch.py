"""Mini-batch generation for joint-representation training (§4.2, Fig. 4).

The Mini-Batch Generator partitions the training dataset's document and
column DEs into non-overlapping random partitions per epoch; a mini
batch pairs one document chunk with one column chunk, forming the small
m×n relatedness matrix of Fig. 5. m and n default to 8% of the
corresponding DE counts (the paper's default; §6.4 finds 5-8% the sweet
spot), with a floor so tiny reproductions still train.
"""
from __future__ import annotations

import numpy as np


def make_minibatches(doc_ids: list[str], col_ids: list[str], *,
                     batch_frac: float = 0.08, min_size: int = 4,
                     rng: np.random.Generator) -> list[tuple[list[str], list[str]]]:
    """One epoch's worth of (doc chunk, col chunk) mini batches.

    Both DE lists are shuffled and split into ceil(1/frac) chunks; the
    union of chunks covers every DE. The longer side dictates the batch
    count; the shorter side's chunks are reused cyclically.
    """
    docs = list(doc_ids)
    cols = list(col_ids)
    rng.shuffle(docs)
    rng.shuffle(cols)
    m = max(min_size, int(np.ceil(batch_frac * len(docs))))
    n = max(min_size, int(np.ceil(batch_frac * len(cols))))
    doc_chunks = [docs[i:i + m] for i in range(0, len(docs), m)]
    col_chunks = [cols[i:i + n] for i in range(0, len(cols), n)]
    n_batches = max(len(doc_chunks), len(col_chunks))
    return [(doc_chunks[i % len(doc_chunks)], col_chunks[i % len(col_chunks)])
            for i in range(n_batches)]
