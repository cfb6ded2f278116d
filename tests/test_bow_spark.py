"""Spark bag-of-words pipeline tests, DuckDB-oracle-checked."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.text.bow import docs_to_bow, filter_high_df, tokens_from_text


@pytest.fixture(scope="module")
def docs_df(spark):
    pdf = pd.DataFrame({
        "doc_id": ["d1", "d2", "d3"],
        "title": ["t1", "t2", "t3"],
        "text": [
            "the drug drug00001 showed binding to enzymes",
            "enzymes and drugs were tested in the trial",
            "common common common filler notes",
        ],
    })
    return spark.createDataFrame(pdf)


class TestTokensFromText:
    def test_tf_counts(self, spark):
        df = spark.createDataFrame(pd.DataFrame(
            {"doc_id": ["d"], "text": ["drug drug enzyme"]}))
        rows = {r["token"]: r["tf"]
                for r in tokens_from_text(df, "doc_id", "text").collect()}
        assert rows == {"drug": 2, "enzyme": 1}

    def test_stopwords_removed(self, docs_df):
        toks = {r["token"] for r in
                tokens_from_text(docs_df, "doc_id", "text").collect()}
        assert "the" not in toks and "and" not in toks

    def test_lemmatized(self, docs_df):
        toks = {r["token"] for r in
                tokens_from_text(docs_df, "doc_id", "text").collect()}
        assert "enzyme" in toks and "enzymes" not in toks

    def test_identifier_preserved(self, docs_df):
        toks = {r["token"] for r in
                tokens_from_text(docs_df, "doc_id", "text").collect()}
        assert "drug00001" in toks


class TestHighDfFilter:
    def test_common_token_dropped(self, spark):
        pdf = pd.DataFrame({
            "de_id": ["a", "b", "c", "a"],
            "token": ["common", "common", "common", "rare"],
            "tf": [1, 1, 1, 1],
        })
        out = filter_high_df(spark.createDataFrame(pdf), max_df_frac=0.5)
        toks = {r["token"] for r in out.collect()}
        assert toks == {"rare"}

    def test_threshold_inclusive(self, spark):
        pdf = pd.DataFrame({
            "de_id": ["a", "b", "c", "d"],
            "token": ["t", "t", "x", "y"],
            "tf": [1] * 4,
        })
        out = filter_high_df(spark.createDataFrame(pdf), max_df_frac=0.5)
        assert "t" in {r["token"] for r in out.collect()}

    def test_oracle_document_frequencies(self, spark, docs_df):
        """Spark-computed document frequencies match DuckDB over the same
        token relation."""
        tokens = tokens_from_text(docs_df, "doc_id", "text")
        dfreq = tokens.groupBy("token").agg(
            F.countDistinct("de_id").alias("df"))
        assert_equivalent(
            dfreq,
            "SELECT token, count(DISTINCT de_id) AS df FROM toks GROUP BY token",
            toks=tokens.toPandas(),
        )


class TestDocsToBow:
    def test_end_to_end(self, docs_df):
        out = docs_to_bow(docs_df, max_df_frac=0.9).toPandas()
        assert set(out.columns) == {"de_id", "token", "tf"}
        assert (out["tf"] >= 1).all()

    def test_high_df_filter_applied(self, docs_df):
        # "enzyme" appears in 2/3 docs; with max_df 0.5 it must vanish
        out = docs_to_bow(docs_df, max_df_frac=0.5).toPandas()
        assert "enzyme" not in set(out["token"])

    def test_lake_docs_bow_nonempty(self, spark, pharma):
        df = spark.createDataFrame(pharma.docs[["doc_id", "title", "text"]].head(20))
        out = docs_to_bow(df).toPandas()
        assert out["de_id"].nunique() == 20
