"""SRQL-style discovery interface (paper §5.2) with CMDL's extensions.

Implements the query APIs from the motivation pipeline (Fig. 1 / §5.2):

- ``content_search(value, mode)`` — keyword search over documents or
  columns (BM25);
- ``crossModal_search(value, topn)`` — Doc→Table via the joint
  embedding space (CMDL's new API);
- ``pkfk(table, topn)`` — joinable tables for a given table;
- ``unionable(table, topn)`` — unionable tables.

Results are :class:`DRS` (Discovery Result Sets) carrying (id, score)
pairs plus provenance of the operation that produced them, and are
indexable with 1-based positions like the paper's ``r1.[1]``.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.discovery.pkfk import CMDL_PKFK, discover_pkfk
from repro.discovery.unionability import UnionIndex
from repro.index.ann import AnnIndex
from repro.index.bm25 import InvertedIndex
from repro.sketch.profiler import Profile
from repro.text.tokenizer import normalize


@dataclass
class DRS:
    """Discovery Result Set: ranked (id, score) with provenance."""

    items: list[tuple[str, float]]
    provenance: str

    def ids(self) -> list[str]:
        return [i for i, _ in self.items]

    def __getitem__(self, pos: int) -> str:
        """1-based access, matching the paper's ``r1.[1]`` syntax."""
        return self.items[pos - 1][0]

    def __len__(self) -> int:
        return len(self.items)


class CMDLSystem:
    """A queryable CMDL instance over one profiled lake."""

    def __init__(self, profile: Profile, *, union_tables: list[str] | None = None):
        self.profile = profile
        self._doc_index = InvertedIndex(profile.doc_tokens)
        ct = profile.col_tokens
        self._col_index = InvertedIndex(ct)
        self._col_table = {r.col_id: r.table
                           for r in profile.col_meta.itertuples()}
        self._union = UnionIndex(
            profile, union_tables or sorted(profile.col_meta["table"].unique()))
        self._ann: AnnIndex | None = None

    def _semantic_index(self) -> AnnIndex:
        if self._ann is None:
            p = self.profile
            vecs = p.joint_vecs if p.joint_vecs else p.content_vecs
            cols = [c for c in p.col_ids if c in vecs]
            self._ann = AnnIndex(cols, np.stack([vecs[c] for c in cols]))
        return self._ann

    # ---- APIs --------------------------------------------------------------
    def content_search(self, value: str, *, mode: str = "Text",
                       topn: int = 10) -> DRS:
        """Keyword search; mode 'Text' targets documents, 'Table' columns."""
        toks = normalize(value)
        idx = self._doc_index if mode == "Text" else self._col_index
        return DRS(idx.query(toks, k=topn), f"content_search({value!r}, {mode})")

    def crossModal_search(self, value: str, *, topn: int = 3) -> DRS:
        """Doc→Table search: ``value`` is a doc_id or free text (§5.2 Q2/Q3)."""
        p = self.profile
        vecs = p.joint_vecs if p.joint_vecs else p.content_vecs
        if value in vecs:
            hits = self._semantic_index().query(vecs[value], k=5 * topn)
        else:
            # free text (e.g. highlighted sentences) has no stored joint
            # vector — embed it with the solo embedder and search the
            # solo content space instead
            qv = p.embedder.mean_pool(normalize(value))
            cols = [c for c in p.col_ids if c in p.content_vecs]
            ann = AnnIndex(cols, np.stack([p.content_vecs[c] for c in cols]))
            hits = ann.query(qv, k=5 * topn)
        return self._tables_drs(hits, topn, f"crossModal_search({value!r})")

    def _tables_drs(self, col_hits: list[tuple[str, float]], topn: int,
                    prov: str) -> DRS:
        tables: dict[str, float] = {}
        for c, s in col_hits:
            t = self._col_table.get(c)
            if t is not None and s > tables.get(t, -np.inf):
                tables[t] = s
        ranked = sorted(tables.items(), key=lambda kv: (-kv[1], kv[0]))[:topn]
        return DRS(ranked, prov)

    def pkfk(self, table: str, *, topn: int = 2) -> DRS:
        """Top joinable tables for ``table`` via PK-FK links (§5.2 Q4)."""
        links = discover_pkfk(self.profile, config=CMDL_PKFK)
        scores: dict[str, float] = {}
        for f, p in links:
            tf, tp = self._col_table.get(f), self._col_table.get(p)
            if tf == table and tp and tp != table:
                scores[tp] = scores.get(tp, 0.0) + 1.0
            elif tp == table and tf and tf != table:
                scores[tf] = scores.get(tf, 0.0) + 1.0
        ranked = sorted(scores.items(), key=lambda kv: (-kv[1], kv[0]))[:topn]
        return DRS(ranked, f"pkfk({table!r})")

    def unionable(self, table: str, *, topn: int = 2) -> DRS:
        """Top unionable tables for ``table`` (§5.2 Q5)."""
        return DRS(self._union.rank(table, k=topn), f"unionable({table!r})")
