"""Gold-label preprocessing: switch off imprecise labeling functions (§4.1).

Given a tiny gold-labeled subset (a fraction of the ground truth plus an
equal number of sampled negatives), measure each LF's accuracy on it and
disable any LF whose accuracy falls below ``ratio`` (default 50%) of the
best LF's accuracy — the paper's heuristic for the few-LF regime where
Snorkel cannot fully suppress a poor LF on its own.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.weak.labeling import LF_NAMES, LabelingContext, lf_topk


def make_gold_pairs(gt_doc2col: pd.DataFrame, doc_ids: list[str],
                    col_ids: list[str], *, frac: float = 0.1,
                    seed: int = 0) -> pd.DataFrame:
    """Sample gold pairs: ``frac`` of the GT links + matched negatives."""
    rng = np.random.default_rng(seed)
    gt = gt_doc2col[gt_doc2col["doc_id"].isin(doc_ids)
                    & gt_doc2col["col_id"].isin(col_ids)]
    pos = gt[["doc_id", "col_id"]].drop_duplicates()
    n = max(2, int(frac * len(pos)))
    pos = pos.sample(n=min(n, len(pos)), random_state=int(rng.integers(1 << 31)))
    pos = pos.assign(y=1)
    true_pairs = set(map(tuple, gt[["doc_id", "col_id"]].itertuples(index=False)))
    neg_rows = []
    attempts = 0
    while len(neg_rows) < len(pos) and attempts < 50 * len(pos):
        d = doc_ids[rng.integers(len(doc_ids))]
        c = col_ids[rng.integers(len(col_ids))]
        if (d, c) not in true_pairs:
            neg_rows.append({"doc_id": d, "col_id": c, "y": 0})
        attempts += 1
    return pd.concat([pos, pd.DataFrame(neg_rows)], ignore_index=True)


def lf_accuracies(ctx: LabelingContext, gold: pd.DataFrame, *, k: int = 10,
                  lfs: tuple[str, ...] = LF_NAMES) -> pd.Series:
    """Retrieval quality of each LF on the gold positives.

    For every gold document the LF's index is probed top-k and scored by
    R-precision against that document's gold columns (hits / #gold
    columns); the LF's score is the mean over gold documents. This is
    the per-search-method score style of the paper's Fig. 9(b) —
    a vote-accuracy on the pair set would be dominated by easy negatives
    (every LF trivially votes 0 on random pairs) and could never trigger
    the 50 %-of-best elimination rule.
    """
    pos = gold[gold["y"] == 1]
    per_doc = pos.groupby("doc_id")["col_id"].apply(set)
    scores = {}
    for lf in lfs:
        vals = []
        for doc_id, truth in per_doc.items():
            top = lf_topk(ctx, doc_id, lf, k=k)
            vals.append(len(top & truth) / max(len(top), 1))
        scores[lf] = float(np.mean(vals)) if vals else 0.0
    return pd.Series(scores)


def select_lfs(accs: pd.Series, *, ratio: float = 0.5) -> tuple[str, ...]:
    """Keep LFs with accuracy ≥ ratio × best accuracy (≥1 LF always kept)."""
    best = accs.max()
    kept = tuple(lf for lf, a in accs.items() if a >= ratio * best)
    return kept if kept else (accs.idxmax(),)
