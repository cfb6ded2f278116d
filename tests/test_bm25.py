"""BM25 / LM-Dirichlet index tests: formula checks and Spark≡driver parity."""
import math

import pandas as pd
import pytest

from repro.index.bm25 import B, K1, InvertedIndex, score_queries_spark

TOKENS = pd.DataFrame({
    "de_id": ["d1", "d1", "d2", "d2", "d3"],
    "token": ["drug", "enzyme", "drug", "gene", "city"],
    "tf":    [2, 1, 1, 3, 5],
})


@pytest.fixture(scope="module")
def idx():
    return InvertedIndex(TOKENS)


class TestInvertedIndex:
    def test_corpus_stats(self, idx):
        assert idx.n_des == 3
        assert idx.dl["d1"] == 3.0
        assert idx.avgdl == pytest.approx((3 + 4 + 5) / 3)

    def test_bm25_hand_computed(self, idx):
        # single-term query "drug": df=2, N=3
        idf = math.log(1 + (3 - 2 + 0.5) / (2 + 0.5))
        tf, dl = 2.0, 3.0
        tfc = tf * (K1 + 1) / (tf + K1 * (1 - B + B * dl / idx.avgdl))
        got = dict(idx.query(["drug"], k=3))
        assert got["d1"] == pytest.approx(idf * tfc)

    def test_ranking_order(self, idx):
        ranked = idx.query(["drug"], k=3)
        assert ranked[0][0] == "d1"  # higher tf, shorter doc

    def test_unknown_token_ignored(self, idx):
        assert idx.query(["zzz"], k=3) == []

    def test_multi_term_additive(self, idx):
        s_both = dict(idx.query(["drug", "enzyme"], k=3))["d1"]
        s_one = dict(idx.query(["drug"], k=3))["d1"]
        assert s_both > s_one

    def test_query_duplicates_collapse(self, idx):
        assert idx.query(["drug", "drug"], k=3) == idx.query(["drug"], k=3)

    def test_k_truncation(self, idx):
        assert len(idx.query(["drug"], k=1)) == 1

    def test_lmd_scores_rank(self, idx):
        ranked = idx.query(["drug"], k=3, method="lmd")
        assert ranked[0][0] == "d1"

    def test_lmd_penalizes_nonmatching_long_doc(self, idx):
        scores = dict(idx.query(["drug"], k=3, method="lmd"))
        assert scores["d1"] > scores["d2"]

    def test_unknown_method(self, idx):
        with pytest.raises(ValueError):
            idx.query(["drug"], method="bogus")

    def test_deterministic_tie_break(self):
        t = pd.DataFrame({"de_id": ["a", "b"], "token": ["x", "x"], "tf": [1, 1]})
        i = InvertedIndex(t)
        assert [d for d, _ in i.query(["x"], k=2)] == ["a", "b"]


class TestSparkParity:
    @pytest.mark.parametrize("method", ["bm25", "lmd"])
    def test_spark_matches_driver(self, spark, idx, method):
        queries = pd.DataFrame({
            "query_id": ["q1", "q1", "q2"],
            "token": ["drug", "enzyme", "city"],
        })
        got = score_queries_spark(
            spark.createDataFrame(queries),
            spark.createDataFrame(TOKENS), method=method).toPandas()
        got = {(r.query_id, r.de_id): r.score for r in got.itertuples()}
        for qid, toks in (("q1", ["drug", "enzyme"]), ("q2", ["city"])):
            for de, score in idx.query(toks, k=10, method=method):
                assert got[(qid, de)] == pytest.approx(score, rel=1e-6), \
                    (qid, de, method)

    def test_spark_only_matching_pairs(self, spark):
        queries = pd.DataFrame({"query_id": ["q"], "token": ["zzz"]})
        got = score_queries_spark(spark.createDataFrame(queries),
                                  spark.createDataFrame(TOKENS))
        assert got.count() == 0
