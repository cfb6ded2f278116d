"""Spark mean-pooling tests (repro.embed.pool)."""
import numpy as np
import pandas as pd
import pytest

from repro.embed.pool import collect_vectors, pool_embeddings
from repro.embed.wordvec import WordEmbedder


@pytest.fixture(scope="module")
def embedder():
    return WordEmbedder({"apple": "fruit", "pear": "fruit", "paris": "city"})


class TestPoolEmbeddings:
    def test_matches_driver_mean(self, spark, embedder):
        pdf = pd.DataFrame({"de_id": ["a", "a", "b"],
                            "token": ["apple", "pear", "paris"]})
        out = pool_embeddings(spark.createDataFrame(pdf), embedder)
        vecs = {r["de_id"]: np.array(r["vec"]) for r in out.collect()}
        assert np.allclose(vecs["a"], embedder.mean_pool(["apple", "pear"]))
        assert np.allclose(vecs["b"], embedder.word_vector("paris"))

    def test_weighted_mean(self, spark, embedder):
        pdf = pd.DataFrame({"de_id": ["a", "a"],
                            "token": ["apple", "paris"], "tf": [3, 1]})
        out = pool_embeddings(spark.createDataFrame(pdf), embedder,
                              weight_col="tf")
        vec = np.array(out.collect()[0]["vec"])
        expected = (3 * embedder.word_vector("apple")
                    + embedder.word_vector("paris")) / 4
        assert np.allclose(vec, expected)

    def test_one_row_per_de(self, spark, embedder):
        pdf = pd.DataFrame({"de_id": ["a"] * 5 + ["b"] * 3,
                            "token": [f"t{i}" for i in range(8)]})
        out = pool_embeddings(spark.createDataFrame(pdf), embedder)
        assert out.count() == 2

    def test_collect_vectors(self, spark, embedder):
        pdf = pd.DataFrame({"de_id": ["a", "b"], "token": ["apple", "paris"]})
        ids, mat = collect_vectors(pool_embeddings(
            spark.createDataFrame(pdf), embedder))
        assert sorted(ids) == ["a", "b"]
        assert mat.shape == (2, embedder.dim)
