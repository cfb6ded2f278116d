"""Synthetic data-lake generator with full ground truth.

The paper evaluates on three real lakes (Pharma, UK-Open, ML-Open) that
are not redistributable, so this module builds topic-structured
synthetic equivalents at ~10-40x reduced scale (see DESIGN.md
substitution table). Every distributional property the evaluation
depends on is an explicit knob:

- *topics* with entity pools and context vocabularies (the semantic
  structure the word embeddings see),
- *tables/columns* whose values are slices of entity pools, giving exact
  control over value containment, cardinality skew (mQCR) and key-ness,
- *PK-FK links* recorded at construction (schema ground truth), plus
  deliberately dirty keys/duplicates to reproduce Table 4's shapes,
- *union variant groups* produced by projection/selection with either
  light renames (UK-Open-style, name-signal-strong) or synonym renames
  (DrugBank-synthetic-style, semantic-signal-strong),
- *documents* that cite column values and/or topic context words, giving
  doc→column ground truth of 'value' and 'semantic' kinds.

Everything is deterministic in the ``seed``.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd


@dataclass
class Topic:
    name: str
    entities: np.ndarray        # entity value strings
    context: list[str]          # context nouns for documents
    synonyms: list[str]         # name-level synonyms (share the topic vector)


@dataclass
class Lake:
    """A generated data lake plus its ground truth."""

    name: str
    columns: pd.DataFrame        # col_id, collection, table, column, dtype, topic
    string_values: pd.DataFrame  # col_id, value (multiset)
    numeric_values: pd.DataFrame # col_id, value (float)
    docs: pd.DataFrame           # doc_id, collection, title, text
    vocab_topics: dict[str, str]
    gt_doc2col: pd.DataFrame     # doc_id, col_id, kind ('value'|'semantic')
    gt_pkfk: pd.DataFrame        # collection, fk_col_id, pk_col_id
    union_groups: pd.DataFrame   # collection, table, group
    collections: pd.DataFrame    # collection, format, is_text

    # ---- derived ground truth ---------------------------------------------
    def gt_doc2table(self) -> pd.DataFrame:
        cols = self.columns[["col_id", "table"]]
        out = self.gt_doc2col.merge(cols, on="col_id")
        return out[["doc_id", "table"]].drop_duplicates()

    def distinct_values(self) -> pd.DataFrame:
        return self.string_values.drop_duplicates()

    def exact_containment(self, col_ids: list[str] | None = None,
                          min_distinct: int = 1) -> pd.DataFrame:
        """Exact all-pairs value containment (brute-force ground truth).

        Returns (col_a, col_b, inter, n_a, n_b, cont_a, cont_b, jaccard)
        for every ordered pair with non-empty intersection. This is the
        generator-side reference; the Spark/DuckDB paths are
        cross-checked against it in tests.
        """
        dv = self.distinct_values()
        if col_ids is not None:
            dv = dv[dv["col_id"].isin(col_ids)]
        sizes = dv.groupby("col_id").size().rename("n")
        pairs = dv.merge(dv, on="value")
        pairs = pairs[pairs["col_id_x"] < pairs["col_id_y"]]
        inter = pairs.groupby(["col_id_x", "col_id_y"]).size().rename("inter").reset_index()
        inter = inter.rename(columns={"col_id_x": "col_a", "col_id_y": "col_b"})
        inter["n_a"] = inter["col_a"].map(sizes)
        inter["n_b"] = inter["col_b"].map(sizes)
        inter = inter[(inter["n_a"] >= min_distinct) & (inter["n_b"] >= min_distinct)]
        inter["cont_a"] = inter["inter"] / inter["n_a"]
        inter["cont_b"] = inter["inter"] / inter["n_b"]
        inter["jaccard"] = inter["inter"] / (inter["n_a"] + inter["n_b"] - inter["inter"])
        return inter.reset_index(drop=True)


NOISE_TOPIC = "__noise__"


class LakeBuilder:
    """Imperative builder used by the per-lake recipe functions."""

    def __init__(self, name: str, seed: int):
        self.name = name
        self.rng = np.random.default_rng(seed)
        self.topics: dict[str, Topic] = {}
        self.vocab_topics: dict[str, str] = {}
        self._cols: list[dict] = []
        self._str_values: list[pd.DataFrame] = []
        self._num_values: list[pd.DataFrame] = []
        self._docs: list[dict] = []
        self._doc_links: list[dict] = []
        self._pkfk: list[dict] = []
        self._union: list[dict] = []
        self._collections: list[dict] = []
        self._tables: dict[str, str] = {}  # table -> collection

    # ---- vocabulary --------------------------------------------------------
    def add_topic(self, name: str, n_entities: int, *, n_context: int = 18,
                  synonyms: tuple[str, ...] = ()) -> Topic:
        entities = np.array([f"{name}{i:05d}" for i in range(n_entities)])
        context = [f"{name}term{j:02d}" for j in range(n_context)]
        t = Topic(name, entities, context, list(synonyms))
        self.topics[name] = t
        for w in entities:
            self.vocab_topics[w] = name
        for w in context:
            self.vocab_topics[w] = name
        self.vocab_topics[name] = name
        for s in synonyms:
            self.vocab_topics[s] = name
        return t

    def add_collection(self, name: str, fmt: str, *, is_text: bool = False) -> None:
        self._collections.append({"collection": name, "format": fmt, "is_text": is_text})

    # ---- columns -----------------------------------------------------------
    def pool(self, topic: str, lo: int = 0, hi: int | None = None) -> np.ndarray:
        ents = self.topics[topic].entities
        return ents[lo: hi if hi is not None else len(ents)]

    def add_str_column(self, collection: str, table: str, column: str, *,
                       topic: str, values: np.ndarray, dup_frac: float = 0.0) -> str:
        """Add a string column whose multiset is ``values`` (+ optional dups)."""
        col_id = f"{table}.{column}"
        vals = list(map(str, values))
        if dup_frac > 0 and vals:
            n_dup = max(1, int(dup_frac * len(vals)))
            vals += list(self.rng.choice(vals, n_dup))
        # plain Python strings only — numpy.str_ breaks Spark's non-Arrow
        # schema inference
        vals = [str(v) for v in vals]
        self._cols.append({
            "col_id": col_id, "collection": collection, "table": table,
            "column": column, "dtype": "str", "topic": topic,
        })
        self._tables[table] = collection
        self._str_values.append(pd.DataFrame({"col_id": col_id, "value": vals}))
        return col_id

    def add_num_column(self, collection: str, table: str, column: str, *,
                       lo: float, hi: float, n: int, unique: bool = False,
                       integer: bool = False, dup_frac: float = 0.0) -> str:
        col_id = f"{table}.{column}"
        if unique and integer:
            span = int(hi - lo)
            vals = lo + self.rng.choice(span, size=min(n, span), replace=False)
        elif integer:
            vals = self.rng.integers(int(lo), int(hi), n).astype(float)
        else:
            vals = lo + self.rng.random(n) * (hi - lo)
        if dup_frac > 0 and len(vals):
            n_dup = max(1, int(dup_frac * len(vals)))
            vals = np.concatenate([vals, self.rng.choice(vals, n_dup)])
        self._cols.append({
            "col_id": col_id, "collection": collection, "table": table,
            "column": column, "dtype": "num", "topic": NOISE_TOPIC,
        })
        self._tables[table] = collection
        self._num_values.append(pd.DataFrame({"col_id": col_id, "value": np.asarray(vals, dtype=float)}))
        return col_id

    def sample(self, pool: np.ndarray, n: int) -> np.ndarray:
        n = min(n, len(pool))
        return self.rng.choice(pool, size=n, replace=False)

    # ---- relationships -----------------------------------------------------
    def add_pkfk(self, collection: str, fk_col_id: str, pk_col_id: str) -> None:
        self._pkfk.append({"collection": collection, "fk_col_id": fk_col_id,
                           "pk_col_id": pk_col_id})

    def add_union_group(self, collection: str, tables: list[str], group: str) -> None:
        for t in tables:
            self._union.append({"collection": collection, "table": t, "group": group})

    # ---- documents ---------------------------------------------------------
    def add_doc(self, collection: str, doc_id: str, title: str, *,
                cite: list[tuple[str, int]] = (),
                ctx: list[tuple[str, int]] = (),
                semantic_links: list[str] = (),
                noise: int = 4, chatter: int = 5) -> None:
        """Create a document.

        ``cite``: (col_id, n) — sample n distinct values from that column
        into the text and record a 'value' ground-truth link.
        ``ctx``: (topic, n) — add n context nouns of the topic.
        ``semantic_links``: col_ids related only semantically (recorded
        as 'semantic' ground truth, no value overlap added).
        ``noise``: unknown-vocabulary nouns; ``chatter``: stopwords and
        function words that the NLP pipeline must strip.
        """
        words: list[str] = []
        sv = self._str_values
        for col_id, n in cite:
            frame = next(f for f in sv if f["col_id"].iloc[0] == col_id)
            distinct = frame["value"].drop_duplicates().to_numpy()
            words += list(self.rng.choice(distinct, size=min(n, len(distinct)), replace=False))
            self._doc_links.append({"doc_id": doc_id, "col_id": col_id, "kind": "value"})
        for topic, n in ctx:
            t = self.topics[topic]
            words += list(self.rng.choice(t.context, size=min(n, len(t.context)), replace=False))
        for col_id in semantic_links:
            self._doc_links.append({"doc_id": doc_id, "col_id": col_id, "kind": "semantic"})
        words += [f"zznoise{int(x):04d}" for x in self.rng.integers(0, 4000, noise)]
        from repro.text.lexicon import FUNCTION_WORDS, STOPWORDS
        filler = sorted(STOPWORDS)[:40] + sorted(FUNCTION_WORDS)[:40]
        words += list(self.rng.choice(filler, chatter))
        self.rng.shuffle(words)
        self._docs.append({"doc_id": doc_id, "collection": collection,
                           "title": title, "text": " ".join(map(str, words))})

    # ---- finalize ----------------------------------------------------------
    def build(self) -> Lake:
        str_values = (pd.concat(self._str_values, ignore_index=True)
                      if self._str_values else pd.DataFrame(columns=["col_id", "value"]))
        num_values = (pd.concat(self._num_values, ignore_index=True)
                      if self._num_values else pd.DataFrame(columns=["col_id", "value"]))
        return Lake(
            name=self.name,
            columns=pd.DataFrame(self._cols),
            string_values=str_values,
            numeric_values=num_values,
            docs=pd.DataFrame(self._docs, columns=["doc_id", "collection", "title", "text"]),
            vocab_topics=dict(self.vocab_topics),
            gt_doc2col=pd.DataFrame(self._doc_links, columns=["doc_id", "col_id", "kind"]),
            gt_pkfk=pd.DataFrame(self._pkfk, columns=["collection", "fk_col_id", "pk_col_id"]),
            union_groups=pd.DataFrame(self._union, columns=["collection", "table", "group"]),
            collections=pd.DataFrame(self._collections),
        )

    # ---- composite helpers -------------------------------------------------
    def add_union_variants(self, collection: str, base_table: str, n_variants: int, *,
                           group: str, rename: str = "light", row_frac: float = 0.55,
                           drop_numeric: bool = True,
                           synonym_map: dict[str, str] | None = None,
                           value_noise_frac: float = 0.0) -> list[str]:
        """Generate unionable variants of ``base_table`` by projection/selection.

        ``rename='light'`` keeps shared name tokens (UK-Open style);
        ``rename='synonym'`` swaps name tokens through ``synonym_map``
        (DrugBank-synthetic style, defeating the name measure while the
        semantic measure — shared topics — still fires).
        """
        base_cols = [c for c in self._cols if c["table"] == base_table]
        str_frames = {f["col_id"].iloc[0]: f for f in self._str_values}
        num_frames = {f["col_id"].iloc[0]: f for f in self._num_values}
        tables = [base_table]
        for v in range(n_variants):
            vt = f"{base_table}_v{v + 1}"
            keep = [c for c in base_cols
                    if not (drop_numeric and v % 2 == 1 and c["dtype"] == "num")]
            # project away one string column on later variants
            if v >= 1 and sum(c["dtype"] == "str" for c in keep) > 2:
                drop_idx = 1 + (v % 2)
                strs = [c for c in keep if c["dtype"] == "str"]
                if drop_idx < len(strs):
                    keep = [c for c in keep if c is not strs[drop_idx]]
            for c in keep:
                new_name = c["column"]
                if rename == "light":
                    new_name = c["column"] + ("_ref" if v % 2 == 0 else "s")
                elif rename == "synonym" and synonym_map:
                    parts = c["column"].split("_")
                    parts = [synonym_map.get(p, p) for p in parts]
                    new_name = "_".join(parts)
                if c["dtype"] == "str":
                    vals = str_frames[c["col_id"]]["value"].drop_duplicates().to_numpy()
                    take = self.sample(vals, max(5, int(row_frac * len(vals))))
                    # value noise: a newer "snapshot" of the same domain —
                    # part of the variant's values come from the topic pool
                    # rather than the base column, weakening the containment
                    # signal while leaving the semantic signal intact (§6.3)
                    if value_noise_frac > 0 and c["topic"] in self.topics:
                        n_noise = int(value_noise_frac * len(take))
                        if n_noise:
                            pool = self.topics[c["topic"]].entities
                            repl = self.rng.choice(pool, size=min(n_noise, len(pool)),
                                                   replace=False)
                            take = np.unique(np.concatenate([take[n_noise:], repl]))
                    self.add_str_column(collection, vt, new_name,
                                        topic=c["topic"], values=take)
                else:
                    nv = num_frames[c["col_id"]]["value"].to_numpy()
                    take = self.rng.choice(nv, size=max(3, int(row_frac * len(nv))),
                                           replace=False)
                    cid = f"{vt}.{new_name}"
                    self._cols.append({"col_id": cid, "collection": collection,
                                       "table": vt, "column": new_name,
                                       "dtype": "num", "topic": NOISE_TOPIC})
                    self._num_values.append(pd.DataFrame({"col_id": cid, "value": take}))
                    self._tables[vt] = collection
            tables.append(vt)
        self.add_union_group(collection, tables, group)
        return tables
