"""Unit tests for the synthetic word-embedding substrate (repro.embed)."""
import numpy as np
import pytest

from repro.embed.wordvec import (DIM, WordEmbedder, hash_noise, topic_centroid)


def _cos(a, b):
    return float(a @ b / (np.linalg.norm(a) * np.linalg.norm(b)))


class TestCentroids:
    def test_unit_norm(self):
        assert np.isclose(np.linalg.norm(topic_centroid("drug")), 1.0)

    def test_deterministic(self):
        assert np.allclose(topic_centroid("drug"), topic_centroid("drug"))

    def test_distinct_topics_far(self):
        # random unit vectors in 100-d are near-orthogonal
        assert abs(_cos(topic_centroid("drug"), topic_centroid("city"))) < 0.35

    def test_dim_parameter(self):
        assert topic_centroid("x", dim=32).shape == (32,)


class TestHashNoise:
    def test_deterministic(self):
        assert np.allclose(hash_noise("w1"), hash_noise("w1"))

    def test_distinct_words_differ(self):
        assert not np.allclose(hash_noise("w1"), hash_noise("w2"))

    def test_unit_norm(self):
        assert np.isclose(np.linalg.norm(hash_noise("w1")), 1.0)


class TestWordEmbedder:
    @pytest.fixture
    def emb(self):
        vocab = {f"drug{i:03d}": "drug" for i in range(20)}
        vocab.update({f"city{i:03d}": "city" for i in range(20)})
        return WordEmbedder(vocab)

    def test_same_topic_words_close(self, emb):
        a = emb.word_vector("drug000")
        b = emb.word_vector("drug001")
        assert _cos(a, b) > 0.5

    def test_cross_topic_words_far(self, emb):
        a = emb.word_vector("drug000")
        b = emb.word_vector("city000")
        assert _cos(a, b) < 0.5

    def test_unknown_word_is_noise(self, emb):
        v = emb.word_vector("zzunknown")
        assert np.allclose(v, hash_noise("zzunknown"))

    def test_embed_words_shape(self, emb):
        m = emb.embed_words(["drug000", "city000", "zz"])
        assert m.shape == (3, DIM)

    def test_embed_empty(self, emb):
        assert emb.embed_words([]).shape == (0, DIM)

    def test_mean_pool_is_mean(self, emb):
        words = ["drug000", "drug001"]
        assert np.allclose(emb.mean_pool(words),
                           emb.embed_words(words).mean(axis=0))

    def test_mean_pool_empty_is_zero(self, emb):
        assert np.allclose(emb.mean_pool([]), np.zeros(DIM))

    def test_pooled_topic_vectors_separate(self, emb):
        drug = emb.mean_pool([f"drug{i:03d}" for i in range(10)])
        city = emb.mean_pool([f"city{i:03d}" for i in range(10)])
        assert _cos(drug, city) < 0.4
        assert _cos(drug, topic_centroid("drug")) > 0.7

    def test_noise_knob(self):
        lo = WordEmbedder({"a": "t", "b": "t"}, noise=0.1)
        hi = WordEmbedder({"a": "t", "b": "t"}, noise=2.0)
        assert _cos(lo.word_vector("a"), lo.word_vector("b")) > \
            _cos(hi.word_vector("a"), hi.word_vector("b"))
