"""Benchmark suite construction — the nine benchmarks of paper Table 2.

Each benchmark is derived from a generated lake plus its ground truth:

- 1A/1B/1C (Doc→Table): query = document, answer = related tables.
- 2A/2B/2C (syntactic join): query = column, answer = joinable columns.
  2B/2C ground truth is brute-force exact set containment (the paper
  runs "an expensive all-pairs exact set similarity"); 2A mimics the
  manual-annotation style of [15]: same-domain (topic) column pairs are
  annotated joinable even when their syntactic overlap is modest.
- 2D (PK-FK): ground truth from the schema definition (construction).
- 3A/3B (union): ground truth = union variant groups.

The module also computes the Table 2 statistics: number of queries,
average answer size, and the median query cardinality ratio (mQCR).
"""
from __future__ import annotations

import re
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.lake.generator import Lake
from repro.text.tokenizer import normalize

_VARIANT_RE = re.compile(r"_v\d+$")

# brute-force joinability threshold for benchmarks 2B/2C (max-direction
# exact containment) and the loose annotation threshold for 2A
JOIN_GT_CONTAINMENT = 0.70
ANNOT_GT_CONTAINMENT = 0.02
MIN_JOIN_DISTINCT = 10


def is_variant_table(table: str) -> bool:
    return bool(_VARIANT_RE.search(table))


@dataclass
class Doc2TableBench:
    name: str
    lake: str
    datasets: str
    doc_collection: str
    table_collections: tuple[str, ...]
    gt_tables: pd.DataFrame          # doc_id, table
    gt_cols: pd.DataFrame            # doc_id, col_id, kind
    candidate_tables: list[str] = field(default_factory=list)

    @property
    def queries(self) -> list[str]:
        return sorted(self.gt_tables["doc_id"].unique())


@dataclass
class JoinBench:
    name: str
    lake: str
    datasets: str
    collections: tuple[str, ...]
    gt_pairs: pd.DataFrame           # col_a, col_b (unordered, col_a < col_b)
    candidate_cols: list[str]

    @property
    def queries(self) -> list[str]:
        return sorted(set(self.gt_pairs["col_a"]) | set(self.gt_pairs["col_b"]))

    def answers(self, query_col: str) -> set[str]:
        g = self.gt_pairs
        return set(g.loc[g["col_a"] == query_col, "col_b"]) | set(
            g.loc[g["col_b"] == query_col, "col_a"])


@dataclass
class PkfkBench:
    name: str
    lake: str
    database: str                    # collection
    gt_links: pd.DataFrame           # fk_col_id, pk_col_id


@dataclass
class UnionBench:
    name: str
    lake: str
    datasets: str
    collection: str
    groups: pd.DataFrame             # table, group

    @property
    def queries(self) -> list[str]:
        return sorted(self.groups["table"].unique())

    def answers(self, table: str) -> set[str]:
        g = self.groups
        grp = g.loc[g["table"] == table, "group"]
        if grp.empty:
            return set()
        members = set(g.loc[g["group"] == grp.iloc[0], "table"])
        return members - {table}


def _join_candidates(lake: Lake, collections: tuple[str, ...],
                     *, exclude_variants: bool = True) -> list[str]:
    cols = lake.columns
    mask = (cols["collection"].isin(collections)) & (cols["dtype"] == "str")
    if exclude_variants:
        mask &= ~cols["table"].map(is_variant_table)
    ids = cols.loc[mask, "col_id"]
    sizes = lake.distinct_values().groupby("col_id").size()
    return [c for c in ids if sizes.get(c, 0) >= MIN_JOIN_DISTINCT]


def _bruteforce_join_gt(lake: Lake, collections: tuple[str, ...],
                        threshold: float) -> tuple[pd.DataFrame, list[str]]:
    cands = _join_candidates(lake, collections)
    cont = lake.exact_containment(cands, min_distinct=MIN_JOIN_DISTINCT)
    cols = lake.columns.set_index("col_id")
    cont = cont[cols.loc[cont["col_a"], "table"].values
                != cols.loc[cont["col_b"], "table"].values]
    best = cont[["cont_a", "cont_b"]].max(axis=1)
    gt = cont.loc[best >= threshold, ["col_a", "col_b"]].reset_index(drop=True)
    return gt, cands


def _annotation_join_gt(lake: Lake, collections: tuple[str, ...]) -> tuple[pd.DataFrame, list[str]]:
    """2A-style ground truth: manual domain annotation.

    Mimics the UK-Open annotation of [15]: two columns are joinable iff
    they draw from the same semantic domain (topic), *regardless of
    their actual value overlap* — the paper explicitly notes this GT
    "does not necessarily imply high syntactic overlap", which is why
    every system scores poorly on 2A. Homograph decoy columns
    (topic ``hg_*``) are never annotated."""
    cands = _join_candidates(lake, collections)
    cols = lake.columns.set_index("col_id")
    rows = [(c, cols.loc[c, "topic"], cols.loc[c, "table"]) for c in cands]
    pairs = []
    for i, (ca, ta, tba) in enumerate(rows):
        if ta.startswith("hg_"):
            continue
        for cb, tb, tbb in rows[i + 1:]:
            if tb == ta and tbb != tba:
                a, b = sorted((ca, cb))
                pairs.append({"col_a": a, "col_b": b})
    gt = pd.DataFrame(pairs, columns=["col_a", "col_b"]).drop_duplicates()
    return gt.reset_index(drop=True), cands


def build_benchmarks(lakes: dict[str, Lake]) -> dict[str, object]:
    """Construct all nine benchmarks from the three lakes."""
    pharma, ukopen, mlopen = lakes["pharma"], lakes["ukopen"], lakes["mlopen"]
    out: dict[str, object] = {}

    # ---- Doc→Table ---------------------------------------------------------
    def doc_bench(name, lake, datasets, doc_coll, table_colls,
                  exclude_variants=True):
        cols = lake.columns
        mask = cols["collection"].isin(table_colls)
        if exclude_variants:
            mask &= ~cols["table"].map(is_variant_table)
        cand_tables = sorted(cols.loc[mask, "table"].unique())
        gt_cols = lake.gt_doc2col.merge(
            cols[["col_id", "table", "collection"]], on="col_id")
        gt_cols = gt_cols[gt_cols["collection"].isin(table_colls)]
        gt_tables = gt_cols[["doc_id", "table"]].drop_duplicates()
        return Doc2TableBench(
            name=name, lake=lake.name, datasets=datasets, doc_collection=doc_coll,
            table_collections=tuple(table_colls),
            gt_tables=gt_tables.reset_index(drop=True),
            gt_cols=gt_cols[["doc_id", "col_id", "kind"]].reset_index(drop=True),
            candidate_tables=cand_tables)

    out["1A"] = doc_bench("1A", ukopen, "Synthetic text + Govt. data",
                          "synthtext", ("govt",))
    out["1B"] = doc_bench("1B", pharma, "PubMed + DrugBank",
                          "pubmed", ("drugbank", "chembl"))
    out["1C"] = doc_bench("1C", mlopen, "Reviews + MS", "reviews", ("ms",))

    # ---- syntactic joins ---------------------------------------------------
    gt2a, cand2a = _annotation_join_gt(ukopen, ("govt",))
    out["2A"] = JoinBench("2A", "ukopen", "Govt. data", ("govt",), gt2a, cand2a)
    gt2b, cand2b = _bruteforce_join_gt(pharma, ("drugbank",), JOIN_GT_CONTAINMENT)
    out["2B"] = JoinBench("2B", "pharma", "DrugBank", ("drugbank",), gt2b, cand2b)
    for sub in ("ss", "ms", "ls"):
        gt, cand = _bruteforce_join_gt(mlopen, (sub,), JOIN_GT_CONTAINMENT)
        out[f"2C-{sub.upper()}"] = JoinBench(
            f"2C-{sub.upper()}", "mlopen", sub.upper(), (sub,), gt, cand)

    # ---- PK-FK -------------------------------------------------------------
    for db in ("drugbank", "chembl", "chebi"):
        g = pharma.gt_pkfk
        out[f"2D-{db}"] = PkfkBench(
            f"2D-{db}", "pharma", db,
            g.loc[g["collection"] == db, ["fk_col_id", "pk_col_id"]].reset_index(drop=True))

    # ---- union -------------------------------------------------------------
    ug = ukopen.union_groups
    out["3A"] = UnionBench("3A", "ukopen", "Govt. data", "govt",
                           ug.loc[ug["collection"] == "govt", ["table", "group"]]
                           .reset_index(drop=True))
    pg = pharma.union_groups
    out["3B"] = UnionBench("3B", "pharma", "DrugBank-Synthetic", "drugbank_synth",
                           pg.loc[pg["collection"] == "drugbank_synth", ["table", "group"]]
                           .reset_index(drop=True))
    return out


# --------------------------------------------------------------------------
# Table 2 statistics
# --------------------------------------------------------------------------

def _doc_bow_sizes(lake: Lake) -> dict[str, int]:
    return {r.doc_id: len(set(normalize(r.text))) for r in lake.docs.itertuples()}


def benchmark_stats(lakes: dict[str, Lake], benches: dict[str, object]) -> pd.DataFrame:
    """Compute #queries, average answer size, and mQCR per benchmark."""
    rows = []
    distinct_sizes = {name: lk.distinct_values().groupby("col_id").size()
                      for name, lk in lakes.items()}
    bow_sizes = {name: _doc_bow_sizes(lk) for name, lk in lakes.items()}
    for name, bench in benches.items():
        lake = lakes[bench.lake]
        sizes = distinct_sizes[bench.lake]
        if isinstance(bench, Doc2TableBench):
            n_q = len(bench.queries)
            avg_ans = bench.gt_tables.groupby("doc_id").size().mean()
            qcr = [
                min(1.0, bow_sizes[bench.lake][r.doc_id] / max(1, sizes.get(r.col_id, 1)))
                for r in bench.gt_cols.itertuples()
            ]
            task = "Doc2Table"
        elif isinstance(bench, JoinBench):
            n_q = len(bench.queries)
            avg_ans = (np.mean([len(bench.answers(q)) for q in bench.queries])
                       if n_q else 0.0)
            qcr = [
                min(sizes.get(a, 1), sizes.get(b, 1)) / max(1, max(sizes.get(a, 1), sizes.get(b, 1)))
                for a, b in bench.gt_pairs[["col_a", "col_b"]].itertuples(index=False)
            ]
            task = "TableJTable (syntactic)"
        elif isinstance(bench, PkfkBench):
            n_q = 1
            avg_ans = len(bench.gt_links)
            qcr = [
                sizes.get(fk, 1) / max(1, sizes.get(pk, 1))
                if (fk in sizes.index and pk in sizes.index) else _num_qcr(lake, fk, pk)
                for fk, pk in bench.gt_links[["fk_col_id", "pk_col_id"]].itertuples(index=False)
            ]
            task = "TableJTable (PK-FK)"
        else:  # UnionBench
            n_q = len(bench.queries)
            avg_ans = (np.mean([len(bench.answers(q)) for q in bench.queries])
                       if n_q else 0.0)
            counts = lake.columns.groupby("table").size()
            qcr = []
            for r in bench.groups.itertuples():
                for other in bench.answers(r.table):
                    a, c = counts.get(r.table, 1), counts.get(other, 1)
                    qcr.append(min(a, c) / max(a, c))
            task = "TableUTable"
        rows.append({
            "benchmark": name, "task": task, "data_lake": bench.lake,
            "datasets": getattr(bench, "datasets", getattr(bench, "database", "")),
            "n_queries": int(n_q), "avg_answer_size": round(float(avg_ans), 1),
            "mQCR": round(float(np.median(qcr)), 3) if qcr else float("nan"),
        })
    return pd.DataFrame(rows)


def _num_qcr(lake: Lake, fk: str, pk: str) -> float:
    nv = lake.numeric_values
    n_fk = nv.loc[nv["col_id"] == fk, "value"].nunique()
    n_pk = nv.loc[nv["col_id"] == pk, "value"].nunique()
    return n_fk / max(1, n_pk)
