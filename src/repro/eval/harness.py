"""Benchmark harness: builds lakes/profiles once and runs Tables 1-6.

Heavy artifacts (lakes, Spark-built profiles, benchmark suites) are
cached per process so tests, pytest-benchmarks, and jobs can share them.
Each ``run_tableN`` returns a pandas DataFrame shaped like the paper's
table; ``repro.eval.tables`` renders them next to the paper's numbers.
"""
from __future__ import annotations

import time

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines import aurum, d3l
from repro.discovery.joinability import JoinIndex
from repro.discovery.pkfk import AURUM_PKFK, CMDL_PKFK, discover_pkfk, undirected
from repro.discovery.unionability import MEASURES, UnionIndex
from repro.eval.metrics import precision_recall_sets, relative_recall
from repro.lake.benchmarks import (JoinBench, PkfkBench, UnionBench,
                                   benchmark_stats, build_benchmarks)
from repro.lake.recipes import ALL_LAKES, build_lake
from repro.sketch.profiler import Profile, profile_lake
from repro.weak.labeling import build_labeling_context

_LAKES: dict[str, object] = {}
_PROFILES: dict[str, Profile] = {}
_BENCHES: dict[str, object] | None = None


def get_lakes() -> dict[str, object]:
    if not _LAKES:
        for name in ALL_LAKES:
            _LAKES[name] = build_lake(name)
    return _LAKES


def get_benches() -> dict[str, object]:
    global _BENCHES
    if _BENCHES is None:
        _BENCHES = build_benchmarks(get_lakes())
    return _BENCHES


def get_profile(spark: SparkSession, lake_name: str) -> Profile:
    if lake_name not in _PROFILES:
        _PROFILES[lake_name] = profile_lake(spark, get_lakes()[lake_name])
    return _PROFILES[lake_name]


# --------------------------------------------------------------------------
# Table 1 — data lake overview
# --------------------------------------------------------------------------

def run_table1() -> pd.DataFrame:
    rows = []
    for name, lake in get_lakes().items():
        sizes = lake.string_values.groupby("col_id")["value"].apply(
            lambda s: s.str.len().sum()).to_dict()
        for coll in lake.collections.itertuples():
            c = coll.collection
            if coll.is_text:
                docs = lake.docs[lake.docs["collection"] == c]
                n_tables, n_des = 0, len(docs)
                size_b = int(docs["text"].str.len().sum())
                num_frac = float("nan")
            else:
                cols = lake.columns[lake.columns["collection"] == c]
                n_tables = cols["table"].nunique()
                n_des = len(cols)
                size_b = int(sum(sizes.get(ci, 0) for ci in cols["col_id"]))
                nv = lake.numeric_values[
                    lake.numeric_values["col_id"].isin(cols["col_id"])]
                size_b += 8 * len(nv)
                num_frac = float((cols["dtype"] == "num").mean())
            rows.append({
                "data_lake": name, "collection": c, "format": coll.format,
                "n_tables": n_tables, "n_des": n_des,
                "size_kb": round(size_b / 1024, 1),
                "numeric_frac": round(num_frac, 2) if num_frac == num_frac else None,
            })
    return pd.DataFrame(rows)


# --------------------------------------------------------------------------
# Table 2 — benchmark overview
# --------------------------------------------------------------------------

def run_table2() -> pd.DataFrame:
    return benchmark_stats(get_lakes(), get_benches())


# --------------------------------------------------------------------------
# Table 3 — syntactic join discovery (R-precision per system)
# --------------------------------------------------------------------------

JOIN_BENCHES = ("2A", "2B", "2C-SS", "2C-MS", "2C-LS")


def run_table3(spark: SparkSession, benches: tuple[str, ...] = JOIN_BENCHES) -> pd.DataFrame:
    rows = []
    for bname in benches:
        bench: JoinBench = get_benches()[bname]
        profile = get_profile(spark, bench.lake)
        idx = JoinIndex(profile, bench.candidate_cols)
        scores = {"Aurum": [], "D3L": [], "CMDL": []}
        for q in bench.queries:
            if q not in idx.pos:
                continue
            truth = bench.answers(q)
            k = len(truth)
            if not k:
                continue
            for system, ranked in (
                ("Aurum", aurum.join_rank(idx, q, k=k)),
                ("D3L", d3l.join_rank(idx, q, k=k)),
                ("CMDL", idx.rank(q, method="containment", k=k)),
            ):
                hits = sum(1 for c, _ in ranked if c in truth)
                scores[system].append(hits / k)
        rows.append({"benchmark": bname, "workload": bench.datasets,
                     **{s: round(float(np.mean(v)), 2) if v else 0.0
                        for s, v in scores.items()}})
    return pd.DataFrame(rows)


# --------------------------------------------------------------------------
# Table 4 — PK-FK join discovery
# --------------------------------------------------------------------------

def run_table4(spark: SparkSession) -> pd.DataFrame:
    profile = get_profile(spark, "pharma")
    rows = []
    for db in ("drugbank", "chembl", "chebi"):
        bench: PkfkBench = get_benches()[f"2D-{db}"]
        truth = undirected({(r.fk_col_id, r.pk_col_id)
                            for r in bench.gt_links.itertuples()})
        out = {"database": db, "known_pkfks": len(truth)}
        for system, cfg in (("Aurum", AURUM_PKFK), ("CMDL", CMDL_PKFK)):
            found = undirected(discover_pkfk(profile, collection=db, config=cfg))
            p, r = precision_recall_sets(found, truth)
            out[f"{system}_precision"] = round(p, 2)
            out[f"{system}_recall"] = round(r, 2)
        rows.append(out)
    return pd.DataFrame(rows)


# --------------------------------------------------------------------------
# Table 5 — individual union similarity measures (Relative Recall)
# --------------------------------------------------------------------------

def run_table5(spark: SparkSession) -> pd.DataFrame:
    rows = []
    for bname in ("3A", "3B"):
        bench: UnionBench = get_benches()[bname]
        profile = get_profile(spark, bench.lake)
        idx = UnionIndex(profile, bench.queries)
        found: dict[str, set] = {m: set() for m in MEASURES}
        found["ensemble"] = set()
        answered: dict[str, set] = {m: set() for m in found}
        all_true: set = set()
        for q in bench.queries:
            truth = bench.answers(q)
            if not truth:
                continue
            k = len(truth)
            all_true |= {(q, t) for t in truth}
            for m in MEASURES:
                ranked = idx.rank(q, k=k, measures=(m,))
                hits = {(q, t) for t, _ in ranked if t in truth}
                found[m] |= hits
                if hits:
                    answered[m].add(q)
            ranked = idx.rank(q, k=k, measures=MEASURES, combiner="ensemble")
            hits = {(q, t) for t, _ in ranked if t in truth}
            found["ensemble"] |= hits
            if hits:
                answered["ensemble"].add(q)
        union_found: set = set()
        for m in MEASURES:
            union_found |= found[m]
        rr = relative_recall(found, reference=union_found)
        n_q = len(bench.queries)
        rows.append({"benchmark": bname, "metric": "RR",
                     **{m: round(rr[m], 2) for m in list(MEASURES) + ["ensemble"]}})
        rows.append({"benchmark": bname, "metric": "queries_answered",
                     **{m: round(len(answered[m]) / n_q, 2)
                        for m in list(MEASURES) + ["ensemble"]}})
    return pd.DataFrame(rows)


# --------------------------------------------------------------------------
# Table 6 — labeling-function index throughput
# --------------------------------------------------------------------------

def run_table6(spark: SparkSession, *, n_queries: int = 200, k: int = 10,
               replicate: int = 128) -> pd.DataFrame:
    """Query throughput (Qps) of the three LF index types (§6.4 Table 6).

    The paper measures against server-scale indexes (UK-Open at 10k-50k
    DEs); our lakes hold a few hundred columns, so each index is built
    over the column set replicated ``replicate`` times (distinct DE ids,
    identical sketches) to restore the cost structure the paper's
    ordering reflects — posting lists and candidate sets grow with the
    corpus, the vectorized ANN product barely does.
    """
    from repro.index.ann import AnnIndex
    from repro.index.bm25 import InvertedIndex
    from repro.index.lshensemble import LSHEnsemble

    profile = get_profile(spark, "pharma")
    bench = get_benches()["1B"]
    scope = profile.col_meta[
        profile.col_meta["table"].isin(set(bench.candidate_tables))]
    cols = [r.col_id for r in scope.itertuples()
            if r.dtype == "str" and "text-search" in r.tags]
    ctx = build_labeling_context(profile, cols, bench.queries)
    docs = [d for d in bench.queries if d in ctx.doc_tokens][:n_queries]

    rep_ids = [f"{c}#{r}" for r in range(replicate) for c in ctx.col_ids]
    ann = AnnIndex(rep_ids, np.tile(
        np.stack([profile.content_vecs[c] for c in ctx.col_ids]), (replicate, 1)))
    lsh = LSHEnsemble([(f"{c}#{r}", *profile.col_token_sigs[c])
                       for r in range(replicate) for c in ctx.col_ids
                       if c in profile.col_token_sigs], threshold=0.3)
    ct = profile.col_tokens
    ct = ct[ct["de_id"].isin(set(ctx.col_ids))]
    rep_tokens = pd.concat(
        [ct.assign(de_id=ct["de_id"] + f"#{r}") for r in range(replicate)],
        ignore_index=True)
    bm25 = InvertedIndex(rep_tokens)

    def timed(fn) -> float:
        t0 = time.perf_counter()
        for d in docs:
            fn(d)
        dt = time.perf_counter() - t0
        return len(docs) / dt if dt > 0 else float("inf")

    qps_content = timed(lambda d: bm25.query(ctx.doc_tokens[d], k=k))
    qps_contain = timed(lambda d: lsh.query(*profile.doc_token_sigs[d], k=k))
    qps_semantic = timed(lambda d: ann.query(profile.content_vecs[d], k=k))
    return pd.DataFrame([
        {"labeling_function": "Content search", "index": "BM25 inverted index",
         "throughput_qps": round(qps_content)},
        {"labeling_function": "Containment", "index": "LSHEnsemble",
         "throughput_qps": round(qps_contain)},
        {"labeling_function": "Semantic", "index": "ANN (exact cosine)",
         "throughput_qps": round(qps_semantic)},
    ])


# --------------------------------------------------------------------------
# Doc→Table evaluation (paper Fig. 6 machinery; used by tests and the
# doc2table job — figures themselves are out of scope, tables are not)
# --------------------------------------------------------------------------

def run_doc2table(spark: SparkSession, bench_name: str, *,
                  ks: tuple[int, ...] = (2, 6),
                  methods: tuple[str, ...] = ("cmdl-solo", "cmdl-joint",
                                              "cmdl-gold", "containment",
                                              "es-bm25-all", "es-lmd-all",
                                              "es-bm25-content", "es-bm25-schema"),
                  sample_frac: float = 0.7, seed: int = 0) -> pd.DataFrame:
    """Precision/recall@k per method for one Doc→Table benchmark."""
    from repro.discovery.doc2table import Doc2TableEngine, evaluate_rankings
    from repro.joint.pipeline import (apply_joint, build_training_dataset,
                                      train_joint_model)
    from repro.weak.gold import make_gold_pairs
    from repro.weak.labeling import build_labeling_context

    bench = get_benches()[bench_name]
    profile = get_profile(spark, bench.lake)
    engine = Doc2TableEngine(spark, profile, bench)
    ctx = None
    rows = []
    for method in methods:
        if method == "cmdl-solo":
            rankings = engine.rank_embedding(profile.content_vecs)
        elif method in ("cmdl-joint", "cmdl-gold"):
            ctx = ctx or build_labeling_context(profile, engine.cols, bench.queries)
            gold = None
            if method == "cmdl-gold":
                gold = make_gold_pairs(bench.gt_cols, bench.queries,
                                       engine.cols, frac=0.1, seed=seed)
            td = build_training_dataset(profile, bench.queries, engine.cols,
                                        sample_frac=sample_frac, seed=seed,
                                        ctx=ctx, gold=gold)
            res = train_joint_model(profile, td, seed=seed)
            apply_joint(profile, res.model)
            rankings = engine.rank_embedding(dict(profile.joint_vecs))
            profile.joint_vecs = {}
        elif method == "containment":
            rankings = engine.rank_containment()
        elif method.startswith("es-"):
            rankings = engine.rank_elastic(method)
        else:
            raise ValueError(f"unknown method {method!r}")
        ev = evaluate_rankings(rankings, bench.gt_tables, list(ks))
        for r in ev.itertuples():
            rows.append({"benchmark": bench_name, "method": method,
                         "k": int(r.k), "precision": round(r.precision, 3),
                         "recall": round(r.recall, 3)})
    return pd.DataFrame(rows)
