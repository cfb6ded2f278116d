"""Enterprise Knowledge Graph materialization (paper §5.1).

The EKG's nodes are the DEs (documents, columns, and — as higher-order
nodes — tables); edges carry a relationship type and a strength weight.
We materialize the edge set as one pandas DataFrame
(src, dst, rel, weight), built from the profiler sketches, the joint
embeddings, and the discovery engines:

- ``semantic`` — top-k solo/joint-embedding neighbours (any DE pair);
- ``containment`` — minhash set-containment ≥ threshold (doc→col and
  col→col);
- ``pkfk`` — directed FK→PK links from the PK-FK engine;
- ``union`` — table↔table unionability above threshold.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.discovery.pkfk import CMDL_PKFK, discover_pkfk
from repro.discovery.unionability import UnionIndex
from repro.index.ann import AnnIndex
from repro.sketch.minhash import est_containment
from repro.sketch.profiler import Profile

EDGE_COLUMNS = ["src", "dst", "rel", "weight"]


def semantic_edges(profile: Profile, *, k: int = 5,
                   use_joint: bool = True) -> pd.DataFrame:
    vecs = profile.joint_vecs if (use_joint and profile.joint_vecs) else profile.content_vecs
    ids = [i for i in (profile.doc_ids + profile.col_ids) if i in vecs]
    idx = AnnIndex(ids, np.stack([vecs[i] for i in ids]))
    rows = []
    for de in ids:
        for other, s in idx.query(vecs[de], k + 1):
            if other != de:
                rows.append({"src": de, "dst": other, "rel": "semantic", "weight": s})
    return pd.DataFrame(rows, columns=EDGE_COLUMNS)


def containment_edges(profile: Profile, *, threshold: float = 0.5) -> pd.DataFrame:
    rows = []
    col_entries = [(c, *profile.value_sigs[c]) for c in profile.col_ids
                   if c in profile.value_sigs]
    for i, (a, sa, na) in enumerate(col_entries):
        for b, sb, nb in col_entries[i + 1:]:
            c_ab = est_containment(sa, na, sb, nb)
            c_ba = est_containment(sb, nb, sa, na)
            if max(c_ab, c_ba) >= threshold:
                rows.append({"src": a, "dst": b, "rel": "containment",
                             "weight": max(c_ab, c_ba)})
    for d, (sd, nd) in profile.doc_token_sigs.items():
        for c, (sc, nc) in profile.col_token_sigs.items():
            v = est_containment(sd, nd, sc, nc)
            if v >= threshold:
                rows.append({"src": d, "dst": c, "rel": "containment", "weight": v})
    return pd.DataFrame(rows, columns=EDGE_COLUMNS)


def pkfk_edges(profile: Profile) -> pd.DataFrame:
    links = discover_pkfk(profile, config=CMDL_PKFK)
    return pd.DataFrame([{"src": f, "dst": p, "rel": "pkfk", "weight": 1.0}
                         for f, p in sorted(links)], columns=EDGE_COLUMNS)


def union_edges(profile: Profile, tables: list[str], *,
                threshold: float = 0.3) -> pd.DataFrame:
    idx = UnionIndex(profile, tables)
    rows = []
    for t in idx.tables:
        for other, s in idx.rank(t):
            if s >= threshold:
                rows.append({"src": t, "dst": other, "rel": "union", "weight": s})
    return pd.DataFrame(rows, columns=EDGE_COLUMNS)


def build_ekg(profile: Profile, *, union_tables: list[str] | None = None,
              semantic_k: int = 5, containment_threshold: float = 0.5) -> pd.DataFrame:
    """Materialize the full EKG edge set."""
    parts = [semantic_edges(profile, k=semantic_k),
             containment_edges(profile, threshold=containment_threshold),
             pkfk_edges(profile)]
    if union_tables:
        parts.append(union_edges(profile, union_tables))
    return pd.concat(parts, ignore_index=True)
