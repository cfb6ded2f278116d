"""Synthetic word embeddings — the offline substitute for fastText (§3).

The profiler only relies on one property of the pre-trained model:
*words with related semantics are close in the vector space*. We realise
that property deterministically: every topic in the synthetic lake has a
Gaussian unit centroid seeded by its name, and a word's vector is its
topic centroid plus hash-seeded noise. Words outside the known
vocabulary get pure hash noise (they are semantically unrelated to
everything, like rare tokens under fastText). The topic map plays the
role of fastText's pre-training corpus knowledge.

All vectors are deterministic functions of strings — no state, no files.
"""
from __future__ import annotations

import hashlib

import numpy as np

DIM = 100
_DEFAULT_NOISE = 0.55


def _seed_from(s: str) -> int:
    return int.from_bytes(hashlib.blake2b(s.encode(), digest_size=8).digest(), "big")


def _unit(v: np.ndarray) -> np.ndarray:
    n = float(np.linalg.norm(v))
    return v / n if n > 0 else v


def topic_centroid(topic: str, dim: int = DIM) -> np.ndarray:
    """Deterministic unit-norm centroid for a topic name."""
    g = np.random.default_rng(_seed_from("topic::" + topic))
    return _unit(g.standard_normal(dim))


def hash_noise(word: str, dim: int = DIM) -> np.ndarray:
    """Deterministic unit-norm noise vector for a word."""
    g = np.random.default_rng(_seed_from("word::" + word))
    return _unit(g.standard_normal(dim))


class WordEmbedder:
    """Embeds words given a word→topic vocabulary map.

    ``noise`` controls intra-topic spread: 0 puts every topic word at the
    centroid; large values wash the topic signal out.
    """

    def __init__(self, vocab_topics: dict[str, str] | None = None, *,
                 dim: int = DIM, noise: float = _DEFAULT_NOISE):
        self.vocab_topics = dict(vocab_topics or {})
        self.dim = dim
        self.noise = noise
        self._centroids: dict[str, np.ndarray] = {}

    def _centroid(self, topic: str) -> np.ndarray:
        c = self._centroids.get(topic)
        if c is None:
            c = self._centroids[topic] = topic_centroid(topic, self.dim)
        return c

    def word_vector(self, word: str) -> np.ndarray:
        topic = self.vocab_topics.get(word)
        noise = hash_noise(word, self.dim)
        if topic is None:
            return noise
        return _unit(self._centroid(topic) + self.noise * noise)

    def embed_words(self, words: list[str]) -> np.ndarray:
        """Matrix of word vectors, one row per word (empty → (0, dim))."""
        if not words:
            return np.zeros((0, self.dim))
        return np.stack([self.word_vector(w) for w in words])

    def mean_pool(self, words: list[str]) -> np.ndarray:
        """Mean-pooled vector over ``words`` (§3, solo embeddings)."""
        m = self.embed_words(words)
        if m.shape[0] == 0:
            return np.zeros(self.dim)
        return m.mean(axis=0)
