"""Doc→Table engine tests (all §6.1 methods on benchmark 1B)."""
import numpy as np
import pytest

from repro.baselines.elastic import ELASTIC_SETTINGS
from repro.discovery.doc2table import evaluate_rankings


class TestEngineSetup:
    def test_scope_restricted_to_candidates(self, engine_1b, bench_1b):
        tables = {engine_1b.col_table[c] for c in engine_1b.cols}
        assert tables <= set(bench_1b.candidate_tables)

    def test_only_text_search_columns(self, engine_1b, pharma_profile):
        meta = pharma_profile.col_meta.set_index("col_id")
        for c in engine_1b.cols:
            assert "text-search" in meta.loc[c, "tags"]


class TestEmbeddingRanking:
    def test_returns_all_queries(self, engine_1b, pharma_profile):
        out = engine_1b.rank_embedding(pharma_profile.content_vecs)
        assert set(out) == set(engine_1b.docs)

    def test_scores_sorted(self, engine_1b, pharma_profile):
        out = engine_1b.rank_embedding(pharma_profile.content_vecs)
        for ranked in list(out.values())[:10]:
            scores = [s for _, s in ranked]
            assert scores == sorted(scores, reverse=True)

    def test_tables_unique_per_ranking(self, engine_1b, pharma_profile):
        out = engine_1b.rank_embedding(pharma_profile.content_vecs)
        for ranked in list(out.values())[:10]:
            names = [t for t, _ in ranked]
            assert len(names) == len(set(names))

    def test_missing_vectors_yield_empty(self, engine_1b):
        out = engine_1b.rank_embedding({})
        assert all(v == [] for v in out.values())


class TestContainmentRanking:
    def test_finds_cited_tables(self, engine_1b, bench_1b):
        out = engine_1b.rank_containment()
        ev = evaluate_rankings(out, bench_1b.gt_tables, [4])
        assert ev.iloc[0]["recall"] > 0.3


class TestElasticRanking:
    @pytest.mark.parametrize("method", sorted(ELASTIC_SETTINGS.values()))
    def test_all_settings_run(self, engine_1b, method):
        out = engine_1b.rank_elastic(method)
        assert set(out) == set(engine_1b.docs)

    def test_content_bm25_effective(self, engine_1b, bench_1b):
        out = engine_1b.rank_elastic("es-bm25-content")
        ev = evaluate_rankings(out, bench_1b.gt_tables, [2])
        assert ev.iloc[0]["precision"] > 0.5

    def test_schema_search_poor(self, engine_1b, bench_1b):
        """'Schema-based search does not produce any promising results
        across the board' (§6.1) — document content rarely matches
        column-name tokens."""
        out = engine_1b.rank_elastic("es-bm25-schema")
        ev = evaluate_rankings(out, bench_1b.gt_tables, [2])
        assert ev.iloc[0]["precision"] < 0.3

    def test_spark_agrees_with_driver_index(self, engine_1b, ctx_1b):
        """The Spark batch BM25 path and the driver inverted index are
        the same formula over the same corpus."""
        spark_out = engine_1b.rank_elastic("es-bm25-content")
        doc = next(d for d in engine_1b.docs if spark_out[d])
        driver = ctx_1b.bm25_content.query(ctx_1b.doc_tokens[d := doc],
                                           k=len(ctx_1b.col_ids))
        # aggregate driver col scores to tables like the engine does
        best = {}
        for c, s in driver:
            t = engine_1b.col_table.get(c)
            if t is not None and s > best.get(t, -np.inf):
                best[t] = s
        for t, s in spark_out[doc][:5]:
            assert s == pytest.approx(best[t], rel=1e-6)


class TestEntityMatchingRanking:
    def test_runs_with_lake_inputs(self, engine_1b, pharma):
        sv = pharma.string_values
        col_values = {c: sv.loc[sv["col_id"] == c, "value"].to_numpy()
                      for c in engine_1b.cols[:10]}
        doc_texts = dict(zip(pharma.docs["doc_id"], pharma.docs["text"]))
        out = engine_1b.rank_entity_matching(
            mode="generic", metric="jaccard", doc_texts=doc_texts,
            col_values=col_values)
        assert set(out) == set(engine_1b.docs)


class TestEvaluateRankings:
    def test_perfect_ranking(self, bench_1b):
        rankings = {d: [(t, 1.0) for t in g["table"]]
                    for d, g in bench_1b.gt_tables.groupby("doc_id")}
        ev = evaluate_rankings(rankings, bench_1b.gt_tables, [1])
        assert ev.iloc[0]["precision"] == 1.0

    def test_empty_rankings(self, bench_1b):
        ev = evaluate_rankings({}, bench_1b.gt_tables, [1, 5])
        assert (ev["precision"] == 0).all() and (ev["recall"] == 0).all()

    def test_recall_increases_with_k(self, engine_1b, bench_1b, pharma_profile):
        out = engine_1b.rank_embedding(pharma_profile.content_vecs)
        ev = evaluate_rankings(out, bench_1b.gt_tables, [1, 3, 8])
        rec = list(ev["recall"])
        assert rec == sorted(rec)
